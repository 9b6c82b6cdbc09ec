package repro.bench

import repro.SparkSpec

/** Shared knobs for the benchmark suites. Defaults are sized so the whole
  * bench run finishes in minutes on the CI container; the paper's full
  * sample sizes are reachable via environment variables (see
  * EXPERIMENTS.md for which configuration produced the recorded numbers).
  */
trait BenchSupport extends SparkSpec {

  /** ML1M/LFM1M generator scale for metric sweeps (1.0 = published size). */
  def benchScale: Double = sys.env.getOrElse("REPRO_BENCH_SCALE", "0.3").toDouble

  /** Emit one machine-greppable result line. */
  def result(table: String, line: String): Unit =
    println(s"RESULT|$table|$line")

  def mean(xs: Seq[Double]): Double = if (xs.isEmpty) Double.NaN else xs.sum / xs.size
}
