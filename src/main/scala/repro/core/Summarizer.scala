package repro.core

import org.apache.spark.SparkContext
import org.apache.spark.broadcast.Broadcast
import repro.graph.EdgeCost
import repro.kg.KgIndex

/** Orchestrates summary computation: scenario → terminal resolution →
  * Eq. (1) weight adjustment → tree kernel → [[Subgraph]].
  *
  * The batch API broadcasts the [[KgIndex]] once and fans the independent
  * summary tasks out over executors (DESIGN.md §3) — the distributed
  * dimension of this workload is the number of summaries, as in the
  * paper's 200-user × k ∈ [1,10] × {methods} experimental grid.
  */
object Summarizer {

  /** Positive floor keeping Dijkstra costs > 0 and penalising every extra
    * edge (the |E_S| minimisation half of the bi-objective).
    */
  val Delta = 1e-6

  sealed trait Method extends Serializable { def label: String }

  /** Algorithm 1 with Eq. (1) path-frequency boosting at strength λ. */
  final case class ST(lambda: Double) extends Method {
    override def label: String = s"st(λ=$lambda)"
  }

  /** Algorithm 2 in the paper's experimental configuration: edge weights
    * ignored (uniform `edgeCost`), prize 1 per terminal, 0 elsewhere.
    */
  final case class PCST(edgeCost: Double = 0.25) extends Method {
    override def label: String = "pcst"
  }

  /** No summarization: the union of the individual explanation paths —
    * the baseline every figure compares against.
    */
  case object Paths extends Method { override def label: String = "paths" }

  /** One summary computation with its performance measurements.
    *
    * `memModelBytes` is the peak working-set model of the kernel (the
    * paper measures process memory on their testbed): ST runs |T| SSSPs
    * whose state is Θ(|T|·|V|); PCST's single Voronoi pass is Θ(|V|).
    */
  final case class Result(scenarioId: String, family: String, method: String, k: Int,
                          subgraph: Subgraph, timeNs: Long, memModelBytes: Long)

  /** Compute one summary on the calling thread. `k` is only carried
    * through to the result for harness grouping.
    */
  def summarize(kg: KgIndex, scenario: Scenario, method: Method, k: Int = 0): Result = {
    val g = kg.graph
    val t0 = System.nanoTime()
    val (sub, mem) = method match {
      case Paths =>
        (pathsUnion(kg, scenario), scenario.paths.iterator.map(_.nodes.length * 8L).sum)

      case ST(lambda) =>
        val terms = scenario.terminals.filter(g.contains).map(g.indexOf).distinct
        val overlay = WeightAdjust.overlay(kg, scenario.paths, scenario.anchors, lambda)
        var wMax = kg.maxBaseWeight
        overlay.forEach((_, w) => if (w > wMax) wMax = w)
        val wm = wMax
        val cost: EdgeCost = (e: Int) => {
          val o = overlay.get(e)
          val w = if (o == null) g.edgeWeight(e) else o.doubleValue()
          (wm - w) + Delta
        }
        val res = SteinerTree.summarize(g, cost, terms)
        (resolve(kg, scenario, res, keepIsolated = true),
          terms.length.toLong * g.numVertices * 12L)

      case PCST(edgeCost) =>
        val terms = scenario.terminals.filter(g.contains).map(g.indexOf).distinct
        val res = Pcst.summarize(g, EdgeCost.uniform(edgeCost), terms,
          Array.fill(terms.length)(1.0))
        (resolve(kg, scenario, res, keepIsolated = false), g.numVertices * 16L)
    }
    Result(scenario.id, scenario.family, method.label, k, sub, System.nanoTime() - t0, mem)
  }

  /** Batch API: independent summaries computed in parallel on executors. */
  def summarizeBatch(sc: SparkContext, kgB: Broadcast[KgIndex],
                     tasks: Seq[(Scenario, Method, Int)]): Seq[Result] = {
    if (tasks.isEmpty) return Seq.empty
    val parallelism = math.max(1, math.min(tasks.size, sc.defaultParallelism * 2))
    sc.parallelize(tasks, parallelism)
      .map { case (scenario, method, k) => summarize(kgB.value, scenario, method, k) }
      .collect()
      .toSeq
  }

  /** Baseline "summary": the raw path union, duplicates retained. */
  private def pathsUnion(kg: KgIndex, scenario: Scenario): Subgraph = {
    val all = scenario.paths.flatMap(_.hops).toArray
    val distinct = scala.collection.mutable.LinkedHashMap.empty[(Long, Long), SummaryEdge]
    all.foreach { case (a, b) =>
      val key = if (a <= b) (a, b) else (b, a)
      if (!distinct.contains(key)) {
        // Hallucinated PLM hops are not KG edges: they are part of the
        // shown explanation but contribute no interaction weight.
        val wM = kg.edgeBetween(a, b).map(kg.graph.edgeWeight).getOrElse(0.0)
        distinct(key) = SummaryEdge(a, b, wM)
      }
    }
    Subgraph(
      terminals = scenario.terminals,
      edges = distinct.values.toArray,
      allEdges = all,
      isolated = Array.empty,
      pathNodeOccurrences = scenario.paths.iterator.map(_.nodes.length).sum,
    )
  }

  /** Turn a kernel result (edge ids) back into a node-id [[Subgraph]]. */
  private def resolve(kg: KgIndex, scenario: Scenario, res: TreeResult,
                      keepIsolated: Boolean): Subgraph = {
    val g = kg.graph
    val edges = res.edgeIds.map { e =>
      SummaryEdge(g.ids(g.edgeSrc(e)), g.ids(g.edgeDst(e)), g.edgeWeight(e))
    }
    val covered = edges.iterator.flatMap(e => Iterator(e.src, e.dst)).toSet
    // Only terminals that exist in G can appear in V_S; a terminal outside
    // the graph (e.g. a hallucinated PLM item) is dropped entirely.
    val isolated =
      if (keepIsolated)
        scenario.terminals.distinct.filter(t => g.contains(t) && !covered.contains(t))
      else Array.empty[Long]
    Subgraph(
      terminals = scenario.terminals,
      edges = edges,
      allEdges = edges.map(e => (e.src, e.dst)),
      isolated = isolated,
      pathNodeOccurrences = res.pathNodeOccurrences,
    )
  }
}
