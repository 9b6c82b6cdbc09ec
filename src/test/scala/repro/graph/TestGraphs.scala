package repro.graph

import org.scalacheck.Gen

/** Shared graph fixtures and reference algorithms for property tests. */
object TestGraphs {

  /** Floyd–Warshall all-pairs shortest paths over the undirected view —
    * the brute-force reference for Dijkstra.
    */
  def floydWarshall(g: CompactGraph, cost: EdgeCost): Array[Array[Double]] = {
    val n = g.numVertices
    val d = Array.fill(n, n)(Double.PositiveInfinity)
    (0 until n).foreach(i => d(i)(i) = 0.0)
    (0 until g.numEdges).foreach { e =>
      val (u, v, c) = (g.edgeSrc(e), g.edgeDst(e), cost(e))
      if (c < d(u)(v)) { d(u)(v) = c; d(v)(u) = c }
    }
    for (k <- 0 until n; i <- 0 until n; j <- 0 until n)
      if (d(i)(k) + d(k)(j) < d(i)(j)) d(i)(j) = d(i)(k) + d(k)(j)
    d
  }

  /** Exact Steiner tree cost via the Dreyfus–Wagner DP (test-only; for
    * tiny graphs). Returns the optimal cost of a tree spanning
    * `terminals`, or +∞ if they are not all connected.
    */
  def exactSteinerCost(g: CompactGraph, cost: EdgeCost, terminals: Array[Int]): Double = {
    val terms = terminals.distinct
    if (terms.length <= 1) return 0.0
    val n = g.numVertices
    val t = terms.length
    val d = floydWarshall(g, cost)
    val full = (1 << t) - 1
    val dp = Array.fill(1 << t, n)(Double.PositiveInfinity)
    for (i <- 0 until t; v <- 0 until n) dp(1 << i)(v) = d(terms(i))(v)
    for (s <- 1 to full) {
      if (Integer.bitCount(s) > 1) {
        // Combine proper sub-splits rooted at v.
        for (v <- 0 until n) {
          var sub = (s - 1) & s
          while (sub > 0) {
            val c = dp(sub)(v) + dp(s ^ sub)(v)
            if (c < dp(s)(v)) dp(s)(v) = c
            sub = (sub - 1) & s
          }
        }
        // Relax through intermediate vertices (Dijkstra would do; FW dist ok).
        for (v <- 0 until n; u <- 0 until n) {
          val c = dp(s)(u) + d(u)(v)
          if (c < dp(s)(v)) dp(s)(v) = c
        }
      }
    }
    (0 until n).map(v => dp(full)(v)).min
  }

  /** Random connected-ish undirected graph as directed triples with
    * distinct random weights (distinctness makes shortest paths unique
    * w.h.p., so cross-implementation tests can compare edge sets).
    */
  def randomGraphGen(maxNodes: Int, extraEdgeFactor: Double = 1.5): Gen[Seq[(Long, Long, Double)]] =
    for {
      n <- Gen.choose(2, maxNodes)
      seed <- Gen.choose(0L, Long.MaxValue)
    } yield {
      val rnd = new scala.util.Random(seed)
      // Random spanning tree first, then extra edges.
      val tree = (1 until n).map { v => (rnd.nextInt(v).toLong, v.toLong) }
      val extra = (0 until (n * extraEdgeFactor).toInt).flatMap { _ =>
        val a = rnd.nextInt(n); val b = rnd.nextInt(n)
        if (a == b) None else Some((math.min(a, b).toLong, math.max(a, b).toLong))
      }
      (tree ++ extra).distinct.map { case (a, b) => (a, b, 0.5 + rnd.nextDouble()) }
    }
}
