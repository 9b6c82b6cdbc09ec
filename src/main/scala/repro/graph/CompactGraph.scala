package repro.graph

import org.apache.spark.sql.DataFrame

/** Per-edge cost oracle used by the tree kernels. Indexed by *edge id*
  * (position in the original directed edge list), not by arc.
  */
trait EdgeCost extends Serializable { def apply(edge: Int): Double }

object EdgeCost {
  /** Uniform cost `c` for every edge (the paper's unweighted PCST setting). */
  def uniform(c: Double): EdgeCost = (_: Int) => c

  /** Cost from a dense array (one entry per edge). */
  def fromArray(a: Array[Double]): EdgeCost = (e: Int) => a(e)
}

/** Result of a single-source Dijkstra run: `dist(v)` is the shortest-path
  * cost from the source to vertex index `v` (Double.PositiveInfinity if
  * unreachable) and `predArc(v)` is the arc index that last relaxed `v`
  * (−1 for the source and unreachable vertices).
  */
final case class SsspResult(source: Int, dist: Array[Double], predArc: Array[Int])

/** Compact CSR (compressed sparse row) view of the knowledge-based graph.
  *
  * The original graph is directed (user→item, item→external, …) but the
  * paper's summaries are *weakly connected* subgraphs, so the adjacency is
  * the undirected view: each directed edge contributes two arcs, both
  * pointing back at the same original edge id so weights/costs and the
  * original direction are preserved in the output.
  *
  * The structure is immutable and serialisable, sized for broadcast
  * (≤ tens of MB at paper scale) so thousands of independent summary
  * computations can run in parallel on executors.
  *
  * @param ids        vertex index → external (KG) node id, sorted ascending
  * @param offsets    CSR offsets, length `numVertices + 1`
  * @param arcTarget  arc → target vertex index
  * @param arcEdge    arc → original edge id
  * @param edgeSrc    edge id → source vertex index (original direction)
  * @param edgeDst    edge id → destination vertex index (original direction)
  * @param edgeWeight edge id → base weight w(e) (after KG weighting, before Eq. 1)
  */
final class CompactGraph(
    val ids: Array[Long],
    val offsets: Array[Int],
    val arcTarget: Array[Int],
    val arcEdge: Array[Int],
    val edgeSrc: Array[Int],
    val edgeDst: Array[Int],
    val edgeWeight: Array[Double],
) extends Serializable {

  val numVertices: Int = ids.length
  val numEdges: Int    = edgeSrc.length

  /** External node id → vertex index (binary search over the sorted ids). */
  def indexOf(id: Long): Int = {
    val i = java.util.Arrays.binarySearch(ids, id)
    require(i >= 0, s"node id $id not in graph")
    i
  }

  /** True iff the external node id is present in the graph. */
  def contains(id: Long): Boolean = java.util.Arrays.binarySearch(ids, id) >= 0

  def degree(v: Int): Int = offsets(v + 1) - offsets(v)

  /** Single-source Dijkstra over the undirected view with per-edge costs.
    *
    * @param source  source vertex index
    * @param cost    edge cost oracle; must be > 0 for every edge
    * @param targets optional settle-set: the search stops early once every
    *                reachable target has been settled (pass null for a full
    *                SSSP). Early stopping is what keeps Algorithm 1 fast —
    *                terminals of one summary live within a few hops.
    */
  def dijkstra(source: Int, cost: EdgeCost, targets: Array[Int] = null): SsspResult = {
    val dist    = Array.fill(numVertices)(Double.PositiveInfinity)
    val predArc = Array.fill(numVertices)(-1)
    val settled = new Array[Boolean](numVertices)
    var remaining = 0
    val isTarget = if (targets == null) null else {
      val b = new Array[Boolean](numVertices)
      targets.foreach { t => if (!b(t)) { b(t) = true; remaining += 1 } }
      b
    }
    // Lazy-deletion binary heap of (dist, vertex) pairs.
    val pq = new java.util.PriorityQueue[Array[Double]](64,
      (a: Array[Double], b: Array[Double]) => java.lang.Double.compare(a(0), b(0)))
    dist(source) = 0.0
    pq.add(Array(0.0, source.toDouble))
    var done = false
    while (!done && !pq.isEmpty) {
      val top = pq.poll()
      val u = top(1).toInt
      if (!settled(u) && top(0) <= dist(u)) {
        settled(u) = true
        if (isTarget != null && isTarget(u)) {
          remaining -= 1
          if (remaining == 0) done = true
        }
        if (!done) {
          var a = offsets(u)
          val end = offsets(u + 1)
          while (a < end) {
            val v = arcTarget(a)
            if (!settled(v)) {
              val e = arcEdge(a)
              val nd = dist(u) + cost(e)
              if (nd < dist(v)) {
                dist(v) = nd
                predArc(v) = a
                pq.add(Array(nd, v.toDouble))
              }
            }
            a += 1
          }
        }
      }
    }
    SsspResult(source, dist, predArc)
  }

  /** Walk the predecessor arcs from `v` back to the SSSP source, returning
    * the edge ids of the shortest path in source→v order.
    */
  def pathEdges(res: SsspResult, v: Int): List[Int] = {
    var cur = v
    var acc: List[Int] = Nil
    while (res.predArc(cur) != -1) {
      val arc = res.predArc(cur)
      val e   = arcEdge(arc)
      acc = e :: acc // prepending while walking backwards yields source→v order
      // The arc relaxed `cur`, so the other endpoint of edge e is the parent.
      cur = if (edgeSrc(e) == cur) edgeDst(e) else edgeSrc(e)
    }
    require(cur == res.source || acc.isEmpty, "predecessor walk did not reach the source")
    acc
  }

  /** Multi-source Dijkstra: Voronoi partition around `sources`.
    *
    * Returns (dist, predArc, owner) where `owner(v)` is the index *into
    * `sources`* of the closest source (−1 if unreachable). This is the
    * engine of the PCST growth (Algorithm 2): one pass, independent of the
    * number of terminals.
    */
  def voronoi(sources: Array[Int], cost: EdgeCost,
              maxDist: Double = Double.PositiveInfinity): (Array[Double], Array[Int], Array[Int]) = {
    val dist    = Array.fill(numVertices)(Double.PositiveInfinity)
    val predArc = Array.fill(numVertices)(-1)
    val owner   = Array.fill(numVertices)(-1)
    val settled = new Array[Boolean](numVertices)
    val pq = new java.util.PriorityQueue[Array[Double]](64,
      (a: Array[Double], b: Array[Double]) => java.lang.Double.compare(a(0), b(0)))
    var s = 0
    while (s < sources.length) {
      val v = sources(s)
      dist(v) = 0.0; owner(v) = s
      pq.add(Array(0.0, v.toDouble, s.toDouble))
      s += 1
    }
    while (!pq.isEmpty) {
      val top = pq.poll()
      val u = top(1).toInt
      if (!settled(u) && top(0) <= dist(u)) {
        settled(u) = true
        owner(u) = top(2).toInt
        var a = offsets(u)
        val end = offsets(u + 1)
        while (a < end) {
          val v = arcTarget(a)
          if (!settled(v)) {
            val e = arcEdge(a)
            val nd = dist(u) + cost(e)
            if (nd < dist(v) && nd <= maxDist) {
              dist(v) = nd
              predArc(v) = a
              pq.add(Array(nd, v.toDouble, owner(u).toDouble))
            }
          }
          a += 1
        }
      }
    }
    (dist, predArc, owner)
  }

  /** BFS hop distances over the undirected view (for path-length stats). */
  def bfsHops(source: Int): Array[Int] = {
    val dist = Array.fill(numVertices)(-1)
    val queue = new java.util.ArrayDeque[Integer]()
    dist(source) = 0
    queue.add(source)
    while (!queue.isEmpty) {
      val u = queue.poll().intValue()
      var a = offsets(u)
      val end = offsets(u + 1)
      while (a < end) {
        val v = arcTarget(a)
        if (dist(v) < 0) { dist(v) = dist(u) + 1; queue.add(v) }
        a += 1
      }
    }
    dist
  }
}

object CompactGraph {

  /** Build from in-memory directed edge triples `(srcId, dstId, weight)`. */
  def fromTriples(triples: Seq[(Long, Long, Double)]): CompactGraph = {
    val ids = triples.iterator.flatMap(t => Iterator(t._1, t._2)).toArray.distinct.sorted
    val idx = ids.zipWithIndex.toMap
    val m = triples.length
    val edgeSrc = new Array[Int](m)
    val edgeDst = new Array[Int](m)
    val edgeW   = new Array[Double](m)
    var e = 0
    triples.foreach { case (s, d, w) =>
      edgeSrc(e) = idx(s); edgeDst(e) = idx(d); edgeW(e) = w; e += 1
    }
    assemble(ids, edgeSrc, edgeDst, edgeW)
  }

  /** Build from an edges DataFrame with columns (src: long, dst: long,
    * weight: double). The collect is deliberate: the CSR is the broadcast
    * payload for executor-parallel summarisation (see DESIGN.md §3).
    */
  def fromEdges(edges: DataFrame): CompactGraph = {
    val rows = edges.selectExpr("cast(src as long)", "cast(dst as long)", "cast(weight as double)")
      .collect()
    val ids = {
      val set = new java.util.HashSet[java.lang.Long](rows.length * 2)
      rows.foreach { r => set.add(r.getLong(0)); set.add(r.getLong(1)) }
      val a = new Array[Long](set.size)
      val it = set.iterator(); var i = 0
      while (it.hasNext) { a(i) = it.next(); i += 1 }
      java.util.Arrays.sort(a); a
    }
    val m = rows.length
    val edgeSrc = new Array[Int](m)
    val edgeDst = new Array[Int](m)
    val edgeW   = new Array[Double](m)
    var e = 0
    while (e < m) {
      val r = rows(e)
      edgeSrc(e) = java.util.Arrays.binarySearch(ids, r.getLong(0))
      edgeDst(e) = java.util.Arrays.binarySearch(ids, r.getLong(1))
      edgeW(e)   = r.getDouble(2)
      e += 1
    }
    assemble(ids, edgeSrc, edgeDst, edgeW)
  }

  private def assemble(ids: Array[Long], edgeSrc: Array[Int], edgeDst: Array[Int],
                       edgeW: Array[Double]): CompactGraph = {
    val n = ids.length
    val m = edgeSrc.length
    val deg = new Array[Int](n + 1)
    var e = 0
    while (e < m) { deg(edgeSrc(e) + 1) += 1; deg(edgeDst(e) + 1) += 1; e += 1 }
    var v = 0
    while (v < n) { deg(v + 1) += deg(v); v += 1 }
    val offsets = deg
    val arcTarget = new Array[Int](2 * m)
    val arcEdge   = new Array[Int](2 * m)
    val cursor = offsets.clone()
    e = 0
    while (e < m) {
      val s = edgeSrc(e); val d = edgeDst(e)
      arcTarget(cursor(s)) = d; arcEdge(cursor(s)) = e; cursor(s) += 1
      arcTarget(cursor(d)) = s; arcEdge(cursor(d)) = e; cursor(d) += 1
      e += 1
    }
    new CompactGraph(ids, offsets, arcTarget, arcEdge, edgeSrc, edgeDst, edgeW)
  }
}
