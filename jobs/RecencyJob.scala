package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.core.{Metrics, Summarizer, UserCentric}
import repro.eval.Sampling
import repro.kg.{KGBuilder, KGParams, KgIndex, MLSynth}
import repro.rec.Pgpr

/** Reproduces the Fig 16 experiment: the effect of the rating/recency
  * balance (β1, β2) on ST summaries — comprehensibility and diversity at
  * k = 10 over PGPR paths, for five (β1, β2) combinations.
  *
  * Run: spark-submit --class repro.jobs.RecencyJob <jar> [scale]
  */
object RecencyJob {
  val Combos: Seq[(Double, Double)] =
    Seq((1.0, 0.0), (0.75, 0.25), (0.5, 0.5), (0.25, 0.75), (0.0, 1.0))

  def main(args: Array[String]): Unit = {
    val scale = args.headOption.map(_.toDouble).getOrElse(0.2)
    val spark = SparkSession.builder.appName("recency").getOrCreate()
    try {
      println("beta1 | beta2 | comprehensibility | diversity")
      run(spark, scale, nUsers = 30).foreach { case (b1, b2, c, d) =>
        println(f"$b1%.2f | $b2%.2f | $c%.4f | $d%.4f")
      }
    } finally spark.stop()
  }

  /** One row per (β1, β2): mean user-centric ST comprehensibility and
    * diversity at k = 10. Recency weights use a 5x-amplified recency term
    * so that β2 materially reorders edge weights inside the short ML1M
    * rating window (ratings are 1–5, f(t) ∈ [0, 1]).
    */
  def run(spark: SparkSession, scale: Double, nUsers: Int): Seq[(Double, Double, Double, Double)] = {
    val tables = MLSynth.ml1m(spark, scale)
    Combos.map { case (b1, b2) =>
      val kg = KGBuilder.build(spark, tables,
        KGParams(beta1 = b1, beta2 = 5.0 * b2, gamma = 1.0 / (90.0 * 24 * 3600)))
      val kgIdx = KgIndex.fromKGraph(kg)
      val (males, females) = Sampling.sampleUsers(kg, nUsers / 2)
      val rec = new Pgpr
      val metrics = (males ++ females).flatMap { u =>
        if (!kgIdx.graph.contains(u)) None
        else {
          val paths = rec.recommend(kgIdx, kgIdx.graph.indexOf(u), 10, seed = 17L)
          if (paths.isEmpty) None
          else {
            val s = Summarizer.summarize(kgIdx, UserCentric(u, paths), Summarizer.ST(1.0)).subgraph
            Some((Metrics.comprehensibility(s), Metrics.diversity(s)))
          }
        }
      }
      val n = math.max(1, metrics.size)
      (b1, b2, metrics.map(_._1).sum / n, metrics.map(_._2).sum / n)
    }
  }
}
