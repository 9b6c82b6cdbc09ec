package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.core.Metrics
import repro.eval.TableIExample

/** Reproduces paper Table I: the worked user-centric example — three
  * explanation paths of total length 13 summarized by ST into a ~6-edge
  * subgraph through the central "Theo Angelopoulos"/"Drama" nodes.
  *
  * Run: spark-submit --class repro.jobs.TableIJob <jar>
  */
object TableIJob {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder.appName("table1").getOrCreate()
    try {
      val totalLen = TableIExample.paths.map(_.length).sum
      println(s"Individual explanation paths (total length $totalLen):")
      TableIExample.paths.foreach { p =>
        println("  " + p.nodes.map(n => TableIExample.names.getOrElse(n, n.toString)).mkString(" -> "))
      }
      val s = TableIExample.summary(spark)
      println(TableIExample.render(s))
      println(f"comprehensibility before=${1.0 / totalLen}%.4f after=${Metrics.comprehensibility(s)}%.4f")
    } finally spark.stop()
  }
}
