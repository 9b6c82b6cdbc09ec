package repro.kg

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types._

/** Synthetic stand-ins for the paper's datasets (see DESIGN.md §2).
  *
  * The real evaluations use ML1M and LFM1M joined with DBpedia; neither is
  * available offline, so these generators reproduce the *graph shape* each
  * dataset contributes — node counts, edge counts, Zipf popularity skew,
  * rating distribution, rating-time window, and the user gender attribute —
  * deterministically in (scale, seed). The paper's algorithms and metrics
  * consume nothing else.
  *
  * All generators are pure DataFrame pipelines (no driver-side data).
  */
object MLSynth {

  /** Shape parameters of a synthetic recommendation dataset.
    *
    * `itemSkew`/`extSkew` are power-quantile skew exponents: a draw maps a
    * uniform u to rank ⌈N·u^skew⌉, so skew = 1 is uniform and the top
    * rank's share is (1/N)^(1/skew). itemSkew = 1.5 puts ~0.4% of ML1M's
    * 932k ratings on the top movie (ML1M's real maximum is ~0.34%);
    * extSkew = 2 makes genre-like hub entities.
    */
  final case class Shape(
      nUsers: Int, nItems: Int, nExternal: Int,
      nRatings: Long, nItemExt: Long, nUserExt: Long,
      itemSkew: Double = 1.5,
      extSkew: Double = 2.0,
      maleShare: Double = 0.717,
      tsMin: Long = 956_700_000L,
      tsMax: Long = 1_046_000_000L,
  )

  /** ML1M + DBpedia shape (paper Table II). Edge targets decompose the
    * published total of 1,125,631: 932,293 user→item and 178,461
    * item→external from the table, the remaining 14,877 as user→external
    * attribute edges.
    */
  val Ml1mShape: Shape = Shape(
    nUsers = 6040, nItems = 3883, nExternal = 10820,
    nRatings = 932_293L, nItemExt = 178_461L, nUserExt = 14_877L)

  /** LFM1M + DBpedia shape (§V "Additional Dataset"). The paper reports
    * 1,091,274 user-song interactions over 4,817 users / 12,492 tracks /
    * 17,491 external entities; it does not report external edge counts, so
    * we keep ML1M's external-edges-per-item ratio.
    */
  val Lfm1mShape: Shape = Shape(
    nUsers = 4817, nItems = 12492, nExternal = 17491,
    nRatings = 1_091_274L, nItemExt = 574_000L, nUserExt = 12_000L)

  def ml1m(spark: SparkSession, scale: Double = 1.0, seed: Long = 7L): DatasetTables =
    generate(spark, scaled(Ml1mShape, scale), seed)

  def lfm1m(spark: SparkSession, scale: Double = 1.0, seed: Long = 11L): DatasetTables =
    generate(spark, scaled(Lfm1mShape, scale), seed)

  /** Synthetic random graph of `totalNodes` nodes with ML1M-like node-type
    * ratios and degrees (paper Table III: 55.97 edges/node; node mix
    * 30.4% users / 19.6% items / 54.5% external).
    */
  def synthetic(spark: SparkSession, totalNodes: Int, seed: Long = 13L): DatasetTables = {
    val nUsers = math.max(1, math.round(totalNodes * 0.3043).toInt)
    val nItems = math.max(1, math.round(totalNodes * 0.19565).toInt)
    val nExt   = math.max(1, totalNodes - nUsers - nItems)
    val totalEdges = math.round(totalNodes * 55.9734)
    val shape = Shape(
      nUsers = nUsers, nItems = nItems, nExternal = nExt,
      nRatings = math.round(totalEdges * 0.8283),
      nItemExt = math.round(totalEdges * 0.1585),
      nUserExt = math.round(totalEdges * 0.0132),
      itemSkew = 1.0, extSkew = 1.0) // "random" graphs: uniform endpoints
    generate(spark, shape, seed)
  }

  /** Node counts scale linearly; edge counts scale by s^1.5. A bipartite
    * interaction matrix cannot keep both its fill ratio and its average
    * degree when both sides shrink linearly — s^1.5 keeps a scaled-down
    * graph sparse enough that the Zipf popularity skew survives dedupe,
    * while s = 1 reproduces the published counts exactly.
    */
  private def scaled(s: Shape, scale: Double): Shape = {
    require(scale > 0 && scale <= 1.0, "scale in (0, 1]")
    val es = math.pow(scale, 1.5)
    def si(x: Int): Int   = math.max(2, math.round(x * scale).toInt)
    def sl(x: Long): Long = math.max(2L, math.round(x * es))
    s.copy(nUsers = si(s.nUsers), nItems = si(s.nItems), nExternal = si(s.nExternal),
           nRatings = sl(s.nRatings), nItemExt = sl(s.nItemExt), nUserExt = sl(s.nUserExt))
  }

  /** Power-quantile popularity draw over ranks 1..n: rank = ⌈n·u^skew⌉,
    * giving P(rank ≤ x) = (x/n)^(1/skew) — Zipf-like concentration on low
    * ranks without the degenerate all-mass-on-rank-1 behaviour of the
    * inverse-CDF trick at small n.
    */
  private def popCol(n: Long, skew: Double, seed: Long): org.apache.spark.sql.Column =
    least(lit(n), greatest(lit(1L),
      ceil(pow(rand(seed), lit(skew)) * n).cast(LongType)))

  /** ML1M-like rating-value draw (mean ≈ 3.6, mode 4). */
  private def ratingCol(seed: Long): org.apache.spark.sql.Column = {
    val r = rand(seed)
    when(r < 0.06, 1.0).when(r < 0.17, 2.0).when(r < 0.43, 3.0).when(r < 0.78, 4.0).otherwise(5.0)
  }

  private def generate(spark: SparkSession, s: Shape, seed: Long): DatasetTables = {
    val users = spark.range(1, s.nUsers + 1L).select(
      col("id") as "user_id",
      when(rand(seed) < s.maleShare, "M").otherwise("F") as "gender",
    )

    // Draw the target count then dedupe: a (user, item) pair drawn twice
    // under the popularity skew collapses to one rating, so achieved counts
    // land a few percent under the published targets; the Table II bench
    // reports the achieved numbers next to the paper's.
    val ratings = spark.range(s.nRatings).select(
      (rand(seed + 1) * s.nUsers + 1).cast(LongType) as "user_id",
      popCol(s.nItems, s.itemSkew, seed + 2) as "item_id",
      ratingCol(seed + 3) as "rating",
      (lit(s.tsMin) + (rand(seed + 4) * (s.tsMax - s.tsMin)).cast(LongType)) as "ts",
    ).dropDuplicates("user_id", "item_id")

    val itemExt = spark.range(s.nItemExt).select(
      (rand(seed + 5) * s.nItems + 1).cast(LongType) as "item_id",
      popCol(s.nExternal, s.extSkew, seed + 6) as "ext_id",
    ).dropDuplicates("item_id", "ext_id")

    // User attributes link into a small "attribute" sub-range of the
    // external id space (age groups, occupations, locations in ML1M).
    val nAttr = math.max(2L, math.min(s.nExternal.toLong, 800L))
    val userExt = spark.range(s.nUserExt).select(
      (rand(seed + 7) * s.nUsers + 1).cast(LongType) as "user_id",
      popCol(nAttr, s.extSkew, seed + 8) as "ext_id",
    ).dropDuplicates("user_id", "ext_id")

    DatasetTables(users, ratings, itemExt, userExt)
  }
}
