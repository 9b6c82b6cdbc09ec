package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.graph.GraphStats
import repro.kg.{KGBuilder, MLSynth}

/** Reproduces paper Table II: statistics of the ML1M knowledge-based
  * graph. Optional arg: scale in (0, 1] (default 1.0 = full ML1M shape).
  *
  * Run: spark-submit --class repro.jobs.TableIIJob <jar> [scale]
  */
object TableIIJob {
  def main(args: Array[String]): Unit = {
    val scale = args.headOption.map(_.toDouble).getOrElse(1.0)
    val spark = SparkSession.builder.appName("table2").getOrCreate()
    try {
      val kg = KGBuilder.build(spark, MLSynth.ml1m(spark, scale))
      val s = GraphStats.compute(kg)
      println(render(scale, s))
    } finally spark.stop()
  }

  def render(scale: Double, s: GraphStats.Stats): String = {
    f"""ML1M Knowledge-Based Graph Statistics (scale=$scale; paper values in brackets)
       |  nodes: users=${s.nUsers} [6040]  items=${s.nItems} [3883]  external=${s.nExternal} [10820]  total=${s.nNodes} [19844]
       |  edges: user-item=${s.userItemEdges} [932293]  item-external=${s.itemExternalEdges} [178461]  user-external=${s.userExternalEdges} [~14877]  total=${s.totalEdges} [1125631]
       |  avg degree: user=${s.avgUserDegree}%.2f [154.35]  item(from users)=${s.avgItemDegreeFromUsers}%.2f [240.10]  item(to external)=${s.avgItemDegreeToExternal}%.2f [45.96]  external=${s.avgExternalDegree}%.2f [17.99]
       |  density=${s.density}%.4f [0.0057]  avgPathLength=${s.avgPathLength}%.2f [3.20]  diameter=${s.diameter} [6]""".stripMargin
  }
}
