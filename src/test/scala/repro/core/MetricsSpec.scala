package repro.core

import repro.kg.NodeIds
import repro.{Oracle, SparkSpec}

class MetricsSpec extends SparkSpec {

  private val u1 = NodeIds.user(1); private val u2 = NodeIds.user(2)
  private val i1 = NodeIds.item(1); private val i2 = NodeIds.item(2)
  private val x1 = NodeIds.external(1)

  private def sub(edges: Seq[(Long, Long, Double)],
                  occurrences: Int = 0, isolated: Seq[Long] = Nil,
                  multiset: Seq[(Long, Long)] = Nil): Subgraph = {
    val es = edges.map { case (a, b, w) => SummaryEdge(a, b, w) }.toArray
    val all = if (multiset.nonEmpty) multiset.toArray else es.map(e => (e.src, e.dst))
    val occ = if (occurrences > 0) occurrences
              else (es.flatMap(e => Seq(e.src, e.dst)) ++ isolated).distinct.length
    Subgraph(Array.empty, es, all, isolated.toArray, occ)
  }

  test("comprehensibility = 1/|E_S|, with total path length for multisets") {
    assert(Metrics.comprehensibility(sub(Seq((u1, i1, 1.0), (i1, x1, 0.0)))) == 0.5)
    val baseline = sub(Seq((u1, i1, 1.0)), multiset = Seq((u1, i1), (u1, i1), (u1, i1)))
    assert(math.abs(Metrics.comprehensibility(baseline) - 1.0 / 3) < 1e-12)
    assert(Metrics.comprehensibility(Subgraph.empty) == 1.0) // capped at 1
  }

  test("actionability counts item nodes over all nodes") {
    val s = sub(Seq((u1, i1, 1.0), (i1, x1, 0.0)))
    assert(math.abs(Metrics.actionability(s) - 1.0 / 3) < 1e-12)
    assert(Metrics.actionability(sub(Seq((i1, i2, 1.0)))) == 1.0)
    assert(Metrics.actionability(Subgraph.empty) == 0.0)
  }

  test("diversity of disjoint edges is 1, of identical edges is 0") {
    assert(Metrics.diversity(sub(Seq((u1, i1, 1.0), (u2, i2, 1.0)))) == 1.0)
    val repeated = sub(Seq((u1, i1, 1.0)), multiset = Seq((u1, i1), (u1, i1)))
    assert(Metrics.diversity(repeated) == 0.0)
  }

  test("diversity of edges sharing one endpoint is 1 - 1/3") {
    val s = sub(Seq((u1, i1, 1.0), (i1, x1, 0.0)))
    assert(math.abs(Metrics.diversity(s) - 2.0 / 3) < 1e-12)
  }

  test("diversity averages over all pairs and needs >= 2 edges") {
    assert(Metrics.diversity(sub(Seq((u1, i1, 1.0)))) == 0.0)
    // Three edges: (u1,i1)&(i1,x1) share, (u1,i1)&(u1,x1)? craft: star at u1.
    val star = sub(Seq((u1, i1, 1.0), (u1, i2, 1.0), (u1, x1, 0.0)))
    assert(math.abs(Metrics.diversity(star) - 2.0 / 3) < 1e-12) // every pair shares u1
  }

  test("redundancy grows with duplicate node mentions") {
    // Two 2-node paths sharing both nodes: 4 mentions, 2 unique -> R = 0.5.
    val s = sub(Seq((u1, i1, 1.0)), occurrences = 4)
    assert(math.abs(Metrics.redundancy(s) - 0.5) < 1e-12)
    // A tree counted once has no duplicates.
    val t = sub(Seq((u1, i1, 1.0), (i1, x1, 0.0)), occurrences = 3)
    assert(Metrics.redundancy(t) == 0.0)
  }

  test("relevance sums base weights w_M of distinct edges") {
    val s = sub(Seq((u1, i1, 4.0), (i1, x1, 0.0), (u2, i1, 3.0)))
    assert(math.abs(Metrics.relevance(s) - 7.0) < 1e-12)
  }

  test("privacy penalises user nodes") {
    val s = sub(Seq((u1, i1, 1.0), (u2, i1, 1.0)))
    assert(math.abs(Metrics.privacy(s) - (1.0 - 2.0 / 3)) < 1e-12)
    assert(Metrics.privacy(sub(Seq((i1, x1, 0.0)))) == 1.0)
    assert(Metrics.privacy(Subgraph.empty) == 1.0)
  }

  test("consistency: identical subgraphs across k give 1, disjoint give 0") {
    val a = sub(Seq((u1, i1, 1.0)))
    val b = sub(Seq((u2, i2, 1.0)))
    assert(Metrics.consistency(Seq(a, a, a)) == 1.0)
    assert(Metrics.consistency(Seq(a, b)) == 0.0)
    assert(Metrics.consistency(Seq(a)) == 1.0)
    assert(math.abs(Metrics.consistency(Seq(a, a, b)) - 0.5) < 1e-12)
  }

  test("isolated terminals count as nodes (ST keeps unreachable terminals)") {
    val s = sub(Seq((u1, i1, 1.0)), isolated = Seq(i2))
    assert(s.nodes.toSet == Set(u1, i1, i2))
    assert(math.abs(Metrics.actionability(s) - 2.0 / 3) < 1e-12)
  }

  test("all metrics stay within their bounds on arbitrary subgraphs") {
    val s = sub(Seq((u1, i1, 4.0), (i1, x1, 0.0), (u2, i2, 3.0)), occurrences = 9)
    val m = Metrics.all(s)
    Seq("comprehensibility", "actionability", "diversity", "redundancy", "privacy").foreach { k =>
      assert(m(k) >= 0.0 && m(k) <= 1.0, s"$k = ${m(k)}")
    }
    assert(m("relevance") >= 0.0 && m("edges") == 3.0 && m("nodes") == 5.0)
  }

  test("oracle: metric aggregation over rows matches DuckDB") {
    import spark.implicits._
    val rows = Seq(
      ("st", 1, 0.5, 0.2), ("st", 2, 0.25, 0.4),
      ("pcst", 1, 0.125, 0.6), ("pcst", 2, 0.1, 0.8),
    ).toDF("method", "k", "comprehensibility", "diversity")
    val agg = rows.groupBy("method")
      .agg(org.apache.spark.sql.functions.round(
        org.apache.spark.sql.functions.avg("comprehensibility"), 6).as("c"),
        org.apache.spark.sql.functions.round(
          org.apache.spark.sql.functions.avg("diversity"), 6).as("d"))
    Oracle.assertEquivalent(agg,
      """SELECT method, ROUND(AVG(CAST(comprehensibility AS DOUBLE)), 6) AS c,
        |       ROUND(AVG(CAST(diversity AS DOUBLE)), 6) AS d
        |FROM rows GROUP BY method""".stripMargin,
      "rows" -> rows)
  }
}
