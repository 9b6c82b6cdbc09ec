package repro.core

import repro.SparkSpec
import repro.graph.{CompactGraph, EdgeCost}

class DistributedSteinerSpec extends SparkSpec {

  /** Edge triples with distinct random costs (unique shortest paths
    * w.h.p.), as a DataFrame and as a CompactGraph for the CSR kernel.
    */
  private def fixture(seed: Long, n: Int) = {
    val rnd = new scala.util.Random(seed)
    val tree = (1 until n).map(v => (rnd.nextInt(v).toLong, v.toLong))
    val extra = (0 until 2 * n).flatMap { _ =>
      val a = rnd.nextInt(n); val b = rnd.nextInt(n)
      if (a == b) None else Some((math.min(a, b).toLong, math.max(a, b).toLong))
    }
    val triples = (tree ++ extra).distinct.map { case (a, b) => (a, b, 0.5 + rnd.nextDouble()) }
    val g = CompactGraph.fromTriples(triples)
    import spark.implicits._
    val df = triples.toDF("src", "dst", "cost")
    (g, df)
  }

  private def localEdgeSet(g: CompactGraph, terminals: Seq[Long]): Set[(Long, Long)] = {
    val cost = EdgeCost.fromArray(g.edgeWeight)
    val r = SteinerTree.summarize(g, cost, terminals.map(g.indexOf).toArray)
    r.edgeIds.map { e =>
      val (a, b) = (g.ids(g.edgeSrc(e)), g.ids(g.edgeDst(e)))
      if (a <= b) (a, b) else (b, a)
    }.toSet
  }

  test("two terminals: GraphX result equals the CSR shortest path") {
    val (g, df) = fixture(seed = 1, n = 12)
    val terms = Seq(0L, 7L)
    val (dist, _) = DistributedSteiner.summarize(spark, df, terms)
    assert(dist == localEdgeSet(g, terms))
  }

  test("multiple terminals: GraphX and CSR kernels build the same summary") {
    Seq((2L, 14, Seq(0L, 5L, 9L)), (3L, 16, Seq(1L, 4L, 8L, 12L))).foreach {
      case (seed, n, terms) =>
        val (g, df) = fixture(seed, n)
        val (distributed, _) = DistributedSteiner.summarize(spark, df, terms)
        assert(distributed == localEdgeSet(g, terms), s"seed=$seed")
    }
  }

  test("closure MST cost equals the sum of local pairwise path costs on a path graph") {
    import spark.implicits._
    val df = Seq((0L, 1L, 1.0), (1L, 2L, 1.0), (2L, 3L, 1.0)).toDF("src", "dst", "cost")
    val (edges, cost) = DistributedSteiner.summarize(spark, df, Seq(0L, 3L))
    assert(edges == Set((0L, 1L), (1L, 2L), (2L, 3L)))
    assert(math.abs(cost - 3.0) < 1e-12)
  }

  test("terminals in different components yield a forest") {
    import spark.implicits._
    val df = Seq((0L, 1L, 1.0), (2L, 3L, 1.0)).toDF("src", "dst", "cost")
    val (edges, _) = DistributedSteiner.summarize(spark, df, Seq(0L, 1L, 2L, 3L))
    assert(edges == Set((0L, 1L), (2L, 3L)))
  }

  test("degenerate terminal sets") {
    import spark.implicits._
    val df = Seq((0L, 1L, 1.0)).toDF("src", "dst", "cost")
    assert(DistributedSteiner.summarize(spark, df, Seq(0L))._1.isEmpty)
    assert(DistributedSteiner.summarize(spark, df, Seq.empty)._1.isEmpty)
  }
}
