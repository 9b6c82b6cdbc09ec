package repro.core

import repro.graph.{CompactGraph, DisjointSet, EdgeCost}

/** Algorithm 2 of the paper: PCST-based summary explanations.
  *
  * The prize-collecting relaxation lets the summary *forego* a terminal
  * whose connection would cost more than its prize — the mechanism the
  * paper uses to keep group summaries (hundreds/thousands of terminals)
  * tractable: minimise C(S) = Σ_{e∈E_S} w'(e) − Σ_{v∈V_S} p(v).
  *
  * The printed pseudo-code is a Prim/Kruskal-style growth sketch whose
  * priority-key semantics do not type-check as written (DESIGN.md §3); we
  * implement the scheme it describes — regions grow out of prized
  * terminals and merge while a connection pays for itself — as a
  * Mehlhorn-style Voronoi realisation of the Goemans–Williamson growth
  * (the 2-approximation the paper cites [54]):
  *
  *  1. one multi-source Dijkstra from all terminals partitions the graph
  *     into Voronoi regions (single pass ⇒ runtime independent of |T|,
  *     the scalability behaviour reported in Figs 9–11);
  *  2. every edge joining two regions proposes a connection of cost
  *     dist(u) + w'(e) + dist(v); the cheapest proposal per region pair
  *     survives;
  *  3. proposals are scanned in Kruskal order and accepted while
  *     cost ≤ remaining prize budget of the two components; an accepted
  *     merge spends that budget.
  *
  * Terminals never merged into a component forfeit their prize and are
  * omitted from the summary (V_S), per the problem definition.
  * Complexity O((|V| + |E|)·log|V|), as stated in §IV-B.
  */
object Pcst {

  /** @param g       the knowledge-based graph (CSR view)
    * @param cost    edge cost oracle w'(e); the paper's experiments ignore
    *                edge weights and use a uniform cost (§V-A)
    * @param terminals terminal vertex indices (deduplicated internally)
    * @param prizes  prize p(t) per terminal, aligned with `terminals`
    *                (non-terminals implicitly have the paper's p = β ≈ 0)
    */
  def summarize(g: CompactGraph, cost: EdgeCost, terminals: Array[Int],
                prizes: Array[Double]): TreeResult = {
    require(terminals.length == prizes.length, "one prize per terminal")
    val (terms, prize) = {
      val seen = new java.util.HashMap[Integer, java.lang.Double]()
      var i = 0
      while (i < terminals.length) {
        val cur = seen.get(terminals(i))
        if (cur == null || cur < prizes(i)) seen.put(terminals(i), prizes(i))
        i += 1
      }
      val t = new Array[Int](seen.size()); val p = new Array[Double](seen.size())
      val it = seen.entrySet().iterator(); var n = 0
      while (it.hasNext) { val e = it.next(); t(n) = e.getKey; p(n) = e.getValue; n += 1 }
      // Deterministic order regardless of hash iteration.
      val order = t.indices.sortBy(t(_)).toArray
      (order.map(t(_)), order.map(p(_)))
    }
    if (terms.length <= 1) return TreeResult(Array.empty, terms.length)

    // A connection dearer than the total prize pool can never be accepted,
    // so the growth radius is capped at the pool (prunes huge graphs).
    val budgetCap = prize.sum
    val (dist, predArc, owner) = g.voronoi(terms, cost, maxDist = budgetCap)

    // Cheapest boundary proposal per region pair.
    val proposals = new java.util.HashMap[Long, Array[Double]]() // (cost, edgeId)
    var e = 0
    while (e < g.numEdges) {
      val u = g.edgeSrc(e); val v = g.edgeDst(e)
      val ou = owner(u); val ov = owner(v)
      if (ou >= 0 && ov >= 0 && ou != ov) {
        val c = dist(u) + cost(e) + dist(v)
        val key = if (ou < ov) (ou.toLong << 32) | ov else (ov.toLong << 32) | ou
        val cur = proposals.get(key)
        if (cur == null || c < cur(0) || (c == cur(0) && e < cur(1).toInt))
          proposals.put(key, Array(c, e.toDouble))
      }
      e += 1
    }

    // Kruskal-ordered prize-aware merging.
    val sorted = {
      val arr = new Array[(Double, Long, Int)](proposals.size())
      val it = proposals.entrySet().iterator(); var n = 0
      while (it.hasNext) {
        val en = it.next()
        arr(n) = (en.getValue()(0), en.getKey, en.getValue()(1).toInt); n += 1
      }
      arr.sortBy { case (c, key, _) => (c, key) }
    }
    val ds = new DisjointSet(terms.length)
    val remaining = prize.clone()
    val edgeSet = new java.util.LinkedHashSet[Integer]()
    var occurrences = 0

    def walkUp(start: Int): Int = { // add path from `start` back to its terminal
      var cur = start
      var len = 0
      while (predArc(cur) != -1) {
        val arc = predArc(cur)
        val pe = g.arcEdge(arc)
        edgeSet.add(pe)
        cur = if (g.edgeSrc(pe) == cur) g.edgeDst(pe) else g.edgeSrc(pe)
        len += 1
      }
      len
    }

    sorted.foreach { case (c, key, be) =>
      val a = (key >> 32).toInt; val b = key.toInt
      val ra = ds.find(a); val rb = ds.find(b)
      if (ra != rb && c <= remaining(ra) + remaining(rb)) {
        val budget = remaining(ra) + remaining(rb) - c
        ds.union(a, b)
        remaining(ds.find(a)) = budget
        edgeSet.add(be)
        val lu = walkUp(g.edgeSrc(be))
        val lv = walkUp(g.edgeDst(be))
        occurrences += lu + lv + 2 // nodes of the full connection path
      }
    }

    val out = new Array[Int](edgeSet.size())
    val it = edgeSet.iterator(); var n = 0
    while (it.hasNext) { out(n) = it.next().intValue(); n += 1 }
    TreeResult(out, occurrences)
  }
}
