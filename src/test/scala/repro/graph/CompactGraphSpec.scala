package repro.graph

import org.scalacheck.{Gen, Prop}
import org.scalatest.funsuite.AnyFunSuite
import repro.PropSupport

class CompactGraphSpec extends AnyFunSuite with PropSupport {

  // A small diamond: 0-1 (1.0), 0-2 (2.0), 1-3 (2.0), 2-3 (0.5), 1-2 (0.1)
  private def diamond: CompactGraph = CompactGraph.fromTriples(Seq(
    (0L, 1L, 1.0), (0L, 2L, 2.0), (1L, 3L, 2.0), (2L, 3L, 0.5), (1L, 2L, 0.1)))

  private def byWeight(g: CompactGraph): EdgeCost = EdgeCost.fromArray(g.edgeWeight)

  test("CSR construction: vertex count, edge count, degrees") {
    val g = diamond
    assert(g.numVertices == 4)
    assert(g.numEdges == 5)
    assert(g.degree(g.indexOf(0)) == 2)
    assert(g.degree(g.indexOf(1)) == 3)
    assert(g.degree(g.indexOf(2)) == 3)
    assert(g.degree(g.indexOf(3)) == 2)
  }

  test("indexOf and ids round-trip; contains") {
    val g = diamond
    (0L to 3L).foreach(id => assert(g.ids(g.indexOf(id)) == id))
    assert(g.contains(2L) && !g.contains(99L))
    intercept[IllegalArgumentException](g.indexOf(99L))
  }

  test("dijkstra finds the cheap multi-hop route over the direct edge") {
    val g = diamond
    val res = g.dijkstra(g.indexOf(0), byWeight(g))
    // 0 -> 1 -> 2 -> 3 = 1.0 + 0.1 + 0.5 = 1.6 beats 0->2->3 = 2.5 and 0->1->3 = 3.0
    assert(math.abs(res.dist(g.indexOf(3)) - 1.6) < 1e-12)
    val path = g.pathEdges(res, g.indexOf(3))
    assert(path.length == 3)
  }

  test("pathEdges reconstructs a contiguous path from source to target") {
    val g = diamond
    val res = g.dijkstra(g.indexOf(0), byWeight(g))
    val path = g.pathEdges(res, g.indexOf(3))
    // Walk the edges and confirm they chain 0 -> ... -> 3.
    var cur = g.indexOf(0)
    path.foreach { e =>
      val (s, d) = (g.edgeSrc(e), g.edgeDst(e))
      assert(s == cur || d == cur, s"edge $e does not touch $cur")
      cur = if (s == cur) d else s
    }
    assert(cur == g.indexOf(3))
  }

  test("dijkstra with unreachable vertices reports +inf") {
    val g = CompactGraph.fromTriples(Seq((0L, 1L, 1.0), (2L, 3L, 1.0)))
    val res = g.dijkstra(g.indexOf(0), byWeight(g))
    assert(res.dist(g.indexOf(1)) == 1.0)
    assert(res.dist(g.indexOf(2)).isInfinity)
    assert(res.dist(g.indexOf(3)).isInfinity)
  }

  test("early-stopped dijkstra agrees with the full run on target dists") {
    val g = diamond
    val full = g.dijkstra(g.indexOf(0), byWeight(g))
    val stopped = g.dijkstra(g.indexOf(0), byWeight(g), targets = Array(g.indexOf(3)))
    assert(stopped.dist(g.indexOf(3)) == full.dist(g.indexOf(3)))
  }

  test("property: dijkstra distances match Floyd-Warshall") {
    checkProp(Prop.forAll(TestGraphs.randomGraphGen(10)) { triples =>
      val g = CompactGraph.fromTriples(triples)
      val cost = byWeight(g)
      val fw = TestGraphs.floydWarshall(g, cost)
      (0 until g.numVertices).forall { s =>
        val res = g.dijkstra(s, cost)
        (0 until g.numVertices).forall { v =>
          val (a, b) = (res.dist(v), fw(s)(v))
          (a.isInfinity && b.isInfinity) || math.abs(a - b) < 1e-9
        }
      }
    }, minTests = 25)
  }

  test("property: path edge costs sum to the reported distance") {
    checkProp(Prop.forAll(TestGraphs.randomGraphGen(10)) { triples =>
      val g = CompactGraph.fromTriples(triples)
      val cost = byWeight(g)
      val res = g.dijkstra(0, cost)
      (0 until g.numVertices).filter(res.dist(_).isFinite).forall { v =>
        val sum = g.pathEdges(res, v).map(cost(_)).sum
        math.abs(sum - res.dist(v)) < 1e-9
      }
    }, minTests = 25)
  }

  test("voronoi: owners are the nearest sources, dists match per-source dijkstra") {
    val g = diamond
    val sources = Array(g.indexOf(0), g.indexOf(3))
    val (dist, _, owner) = g.voronoi(sources, byWeight(g))
    val d0 = g.dijkstra(sources(0), byWeight(g))
    val d3 = g.dijkstra(sources(1), byWeight(g))
    (0 until g.numVertices).foreach { v =>
      val expected = math.min(d0.dist(v), d3.dist(v))
      assert(math.abs(dist(v) - expected) < 1e-12)
      if (d0.dist(v) < d3.dist(v)) assert(owner(v) == 0)
      if (d3.dist(v) < d0.dist(v)) assert(owner(v) == 1)
    }
  }

  test("voronoi maxDist prunes the search") {
    val g = CompactGraph.fromTriples(Seq((0L, 1L, 1.0), (1L, 2L, 1.0), (2L, 3L, 1.0)))
    val (dist, _, owner) = g.voronoi(Array(g.indexOf(0)), byWeight(g), maxDist = 1.5)
    assert(dist(g.indexOf(1)) == 1.0)
    assert(dist(g.indexOf(2)).isInfinity)
    assert(owner(g.indexOf(3)) == -1)
  }

  test("bfsHops: hop counts over the undirected view") {
    val g = CompactGraph.fromTriples(Seq((0L, 1L, 9.0), (1L, 2L, 9.0), (3L, 2L, 9.0)))
    val hops = g.bfsHops(g.indexOf(0))
    assert(hops(g.indexOf(0)) == 0)
    assert(hops(g.indexOf(1)) == 1)
    assert(hops(g.indexOf(2)) == 2)
    assert(hops(g.indexOf(3)) == 3) // reached against edge direction
  }

  test("fromTriples and fromEdges build identical graphs") {
    val spark = repro.SparkSpec.shared
    import spark.implicits._
    val triples = Seq((10L, 20L, 1.5), (20L, 30L, 2.5), (10L, 30L, 3.5))
    val a = CompactGraph.fromTriples(triples)
    val b = CompactGraph.fromEdges(triples.toDF("src", "dst", "weight"))
    assert(a.ids.sameElements(b.ids))
    assert(a.numEdges == b.numEdges)
    (0 until a.numVertices).foreach(v => assert(a.degree(v) == b.degree(v)))
    val da = a.dijkstra(0, byWeight(a))
    val db = b.dijkstra(0, byWeight(b))
    assert(da.dist.sameElements(db.dist))
  }
}
