package repro.core

import repro.graph.{CompactGraph, DisjointSet, EdgeCost}

/** Result of a tree kernel run.
  *
  * @param edgeIds              distinct edge ids of the summary subgraph
  * @param pathNodeOccurrences  Σ node count over the constituent expansion
  *                             paths (before dedup) — basis of the paper's
  *                             redundancy metric for summaries
  */
final case class TreeResult(edgeIds: Array[Int], pathNodeOccurrences: Int)

/** Algorithm 1 of the paper: ST-based summary explanations via the
  * Kou–Markowsky–Berman 2-approximation —
  *
  *  1. shortest paths between all terminal pairs (one early-stopped
  *     Dijkstra per terminal),
  *  2. MST of the metric closure over the terminals (Kruskal),
  *  3. MST edges expanded back to their underlying graph paths.
  *
  * The bi-objective "minimise |E_S|, maximise Σw(e)" enters through the
  * cost oracle: callers pass cost(e) = W_max − w(e) + δ (see
  * [[Summarizer]] and DESIGN.md §3), keeping Dijkstra's positivity
  * requirement while trading edge count against total weight.
  *
  * Terminals in different weak components yield a Steiner forest: each
  * component is spanned, no cross-component edge is invented.
  * Complexity O(|T|·(|E| + |V|·log|V|)), the bound stated in §IV-A.
  */
object SteinerTree {

  def summarize(g: CompactGraph, cost: EdgeCost, terminals: Array[Int]): TreeResult = {
    val terms = terminals.distinct
    if (terms.length <= 1) return TreeResult(Array.empty, terms.length)

    // Step 1-2: metric closure. One SSSP per terminal, early-stopped once
    // the other terminals are settled.
    val sssp = terms.map(t => g.dijkstra(t, cost, terms.filter(_ != t)))

    // Step 3-7: MST of the terminal metric closure (Kruskal over all
    // finite terminal pairs; deterministic tie-breaking by indices).
    val pairs = scala.collection.mutable.ArrayBuffer.empty[(Double, Int, Int)]
    var i = 0
    while (i < terms.length) {
      var j = i + 1
      while (j < terms.length) {
        val d = sssp(i).dist(terms(j))
        if (d.isFinite) pairs += ((d, i, j))
        j += 1
      }
      i += 1
    }
    val ds = new DisjointSet(terms.length)
    val edgeSet = new java.util.LinkedHashSet[Integer]()
    var occurrences = 0

    // Steps 8-14: expand each accepted closure edge into its graph path.
    pairs.sortBy { case (d, a, b) => (d, a, b) }.foreach { case (_, a, b) =>
      if (ds.union(a, b)) {
        val path = g.pathEdges(sssp(a), terms(b))
        // Count only the nodes of newly added segments: a segment of L new
        // edges introduces at most L + 1 node mentions, and re-walking an
        // already summarized edge is not a duplicate "mention" — the tree
        // is presented once, which is what keeps ST redundancy below the
        // baselines' (§V-B4).
        val newEdges = path.count(e => !edgeSet.contains(e))
        occurrences += newEdges + 1
        path.foreach(e => edgeSet.add(e))
      }
    }

    val out = new Array[Int](edgeSet.size())
    val it = edgeSet.iterator(); var n = 0
    while (it.hasNext) { out(n) = it.next().intValue(); n += 1 }
    TreeResult(out, occurrences)
  }
}
