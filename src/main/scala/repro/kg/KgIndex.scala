package repro.kg

import repro.graph.CompactGraph

/** Broadcastable query-side view of a knowledge-based graph: the CSR
  * structure plus per-vertex node types, degree-ordered popularity ranks
  * (used by the LM-style baseline simulators), and an undirected
  * (src, dst) → edge-id lookup.
  *
  * Built once on the driver from the edges DataFrame and broadcast to
  * executors; every per-user/per-item summary or recommendation query then
  * runs in parallel over the sample (DESIGN.md §3).
  */
final class KgIndex(val graph: CompactGraph) extends Serializable {

  /** Vertex index → node type (derived from the global id ranges). */
  val vtype: Array[Byte] = graph.ids.map(NodeIds.typeOf)

  /** Largest base edge weight in the graph (W_max before Eq. 1). */
  val maxBaseWeight: Double =
    if (graph.numEdges == 0) 0.0 else graph.edgeWeight.max

  /** Vertex indices of each type, sorted by descending undirected degree
    * (ties by vertex index) — the popularity ranking the PLM/PEARLM
    * simulators sample from.
    */
  val byPopularity: Map[Byte, Array[Int]] = {
    val all = (0 until graph.numVertices).toArray
    Seq(NodeType.User, NodeType.Item, NodeType.External).map { t =>
      t -> all.filter(v => vtype(v) == t).sortBy(v => (-graph.degree(v), v))
    }.toMap
  }

  /** Undirected edge lookup; rebuilt lazily on each executor after
    * deserialisation (cheaper than shipping the map).
    */
  @transient private lazy val edgeLookup: java.util.HashMap[Long, Integer] = {
    val m = new java.util.HashMap[Long, Integer](graph.numEdges * 2)
    var e = 0
    while (e < graph.numEdges) {
      m.putIfAbsent(key(graph.edgeSrc(e), graph.edgeDst(e)), e)
      e += 1
    }
    m
  }

  private def key(a: Int, b: Int): Long =
    if (a <= b) (a.toLong << 32) | (b.toLong & 0xffffffffL)
    else (b.toLong << 32) | (a.toLong & 0xffffffffL)

  /** Edge id between two node ids, in either direction, if present. */
  def edgeBetween(aId: Long, bId: Long): Option[Int] = {
    if (!graph.contains(aId) || !graph.contains(bId)) return None
    val e = edgeLookup.get(key(graph.indexOf(aId), graph.indexOf(bId)))
    if (e == null) None else Some(e.intValue())
  }

  /** Iterate the undirected neighbourhood of `v` as (neighbor, edgeId). */
  @inline def foreachNeighbor(v: Int)(f: (Int, Int) => Unit): Unit = {
    var a = graph.offsets(v)
    val end = graph.offsets(v + 1)
    while (a < end) { f(graph.arcTarget(a), graph.arcEdge(a)); a += 1 }
  }

  /** Item vertices adjacent to user vertex `u` (= the items `u` rated),
    * with the connecting edge id, sorted by descending edge weight.
    */
  def ratedItems(u: Int): Array[(Int, Int)] = {
    val buf = scala.collection.mutable.ArrayBuffer.empty[(Int, Int)]
    foreachNeighbor(u) { (v, e) => if (vtype(v) == NodeType.Item) buf += ((v, e)) }
    buf.sortBy { case (v, e) => (-graph.edgeWeight(e), v) }.toArray
  }

  /** Set view of the items a user rated (vertex indices). */
  def ratedItemSet(u: Int): java.util.HashSet[Integer] = {
    val s = new java.util.HashSet[Integer]()
    foreachNeighbor(u) { (v, _) => if (vtype(v) == NodeType.Item) s.add(v) }
    s
  }
}

object KgIndex {
  /** Build from a knowledge-based graph's edges DataFrame. */
  def fromKGraph(kg: KGraph): KgIndex = new KgIndex(CompactGraph.fromEdges(kg.edges))
}
