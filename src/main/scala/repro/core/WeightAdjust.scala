package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.kg.KgIndex
import repro.rec.ExplanationPath

/** Eq. (1) of the paper: boost the weight of edges that appear in the
  * individual explanation paths so the summarizer *summarizes* rather than
  * invents explanations.
  *
  *   w(e) = w_M(e) · (1 + λ · (Σ_{x∈S} 1_{e ∈ P_x}) / |S|)
  *
  * i.e. the boost of edge `e` is proportional to the fraction of the
  * anchor set S (recommended items / target users) whose explanation path
  * contains `e`. λ = 0 nullifies the input paths; λ = 100 makes the
  * summary follow them almost exclusively.
  *
  * Two implementations with identical semantics:
  *   - [[adjustedEdges]]: the DataFrame pipeline (oracle-checked vs DuckDB);
  *   - [[overlay]]: the per-summary kernel form — a sparse edge-id → weight
  *     overlay on the broadcast CSR graph, since only path edges change.
  */
object WeightAdjust {

  /** DataFrame form. `edges` must have (src, dst, weight); `pathHops` must
    * have (path_id, src, dst), one row per hop of each explanation path
    * (hop orientation may be the reverse of the stored edge — both are
    * matched, as summaries are weakly-connected subgraphs).
    * Returns `edges` with an extra column `adj_weight`.
    */
  def adjustedEdges(edges: DataFrame, pathHops: DataFrame, anchors: Long, lambda: Double): DataFrame = {
    val freq = pathHops
      .select(col("path_id"),
        least(col("src"), col("dst")) as "a", greatest(col("src"), col("dst")) as "b")
      .distinct() // an edge counts once per path
      .groupBy(col("a"), col("b"))
      .agg(count(lit(1)) as "n_paths")
    edges
      .withColumn("a", least(col("src"), col("dst")))
      .withColumn("b", greatest(col("src"), col("dst")))
      .join(freq, Seq("a", "b"), "left")
      .withColumn("adj_weight",
        col("weight") * (lit(1.0) + lit(lambda) * coalesce(col("n_paths"), lit(0L)) / lit(anchors.toDouble)))
      .drop("a", "b", "n_paths")
  }

  /** Kernel form: sparse overlay edgeId → adjusted weight, containing only
    * the edges that occur in `paths` (every other edge keeps its base
    * weight). Hops that are not KG edges (PLM's hallucinated hops) boost
    * nothing — they cannot be traversed by a subgraph of G.
    */
  def overlay(kg: KgIndex, paths: Seq[ExplanationPath], anchors: Int,
              lambda: Double): java.util.HashMap[Integer, java.lang.Double] = {
    val counts = new java.util.HashMap[Integer, Integer]()
    paths.foreach { p =>
      val seen = new java.util.HashSet[Integer]()
      p.hops.foreach { case (a, b) =>
        kg.edgeBetween(a, b).foreach { e =>
          if (seen.add(e)) counts.merge(e, 1, (x: Integer, y: Integer) => x + y)
        }
      }
    }
    val out = new java.util.HashMap[Integer, java.lang.Double](counts.size())
    val n = math.max(1, anchors).toDouble
    counts.forEach { (e, c) =>
      out.put(e, kg.graph.edgeWeight(e) * (1.0 + lambda * c.doubleValue() / n))
    }
    out
  }
}
