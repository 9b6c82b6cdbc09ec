package repro.bench

import repro.jobs.RecencyJob

/** Figure 16: the β1 (rating) / β2 (recency) balance. Published shape:
  * rating-dominant weights maximise comprehensibility (popular items →
  * compact summaries); recency-dominant weights maximise diversity
  * (fresh, less common items enter the summaries).
  */
class RecencyBench extends BenchSupport {

  test("Fig 16: comprehensibility and diversity across beta combinations") {
    val rows = RecencyJob.run(spark, scale = math.min(benchScale, 0.2), nUsers = 16)
    rows.foreach { case (b1, b2, c, d) =>
      result("fig16", f"beta1=$b1%.2f beta2=$b2%.2f compr=$c%.4f div=$d%.4f")
    }
    val ratingDominant = rows.head  // (1.0, 0.0)
    val recencyDominant = rows.last // (0.0, 1.0)
    // Shape: comprehensibility peaks toward the rating end, diversity
    // toward the recency end.
    assert(ratingDominant._3 >= recencyDominant._3 - 0.02,
      f"rating-dominant comprehensibility ${ratingDominant._3}%.4f vs ${recencyDominant._3}%.4f")
    assert(recencyDominant._4 >= ratingDominant._4 - 0.02,
      f"recency-dominant diversity ${recencyDominant._4}%.4f vs ${ratingDominant._4}%.4f")
  }
}
