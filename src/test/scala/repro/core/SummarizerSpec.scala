package repro.core

import repro.SparkSpec
import repro.eval.TableIExample
import repro.kg.{KGBuilder, KgIndex, MLSynth, NodeType}
import repro.rec.Pgpr

class SummarizerSpec extends SparkSpec {

  private lazy val exampleIdx = KgIndex.fromKGraph(TableIExample.knowledgeGraph(spark))
  private lazy val scenario = UserCentric(TableIExample.User1, TableIExample.paths)

  private lazy val mlKg  = KGBuilder.build(spark, MLSynth.ml1m(spark, scale = 0.05))
  private lazy val mlIdx = KgIndex.fromKGraph(mlKg)

  test("ST summary connects the user to every recommended item") {
    val r = Summarizer.summarize(exampleIdx, scenario, Summarizer.ST(1.0))
    val s = r.subgraph
    assert(s.isolated.isEmpty, "all terminals reachable in the example KG")
    assert(s.coveredTerminals.toSet == scenario.terminals.toSet)
    assert(s.componentCount == 1)
  }

  test("ST summary is far smaller than the union of paths (Table I shape)") {
    val st = Summarizer.summarize(exampleIdx, scenario, Summarizer.ST(1.0)).subgraph
    val base = Summarizer.summarize(exampleIdx, scenario, Summarizer.Paths).subgraph
    assert(base.edgeOccurrences == 13, "paper: total explanation length 13")
    assert(st.edges.length <= 7, s"paper achieves 6 edges; got ${st.edges.length}")
    assert(st.edges.length < base.edgeOccurrences / 2)
  }

  test("Paths method: union keeps duplicates in allEdges, dedupes edges") {
    val p = TableIExample.paths
    val doubled = UserCentric(TableIExample.User1, p ++ p.map(x => x.copy(rank = x.rank + 3)))
    val s = Summarizer.summarize(exampleIdx, doubled, Summarizer.Paths).subgraph
    assert(s.allEdges.length == 26)
    assert(s.edges.length == 13)
  }

  test("lambda = 100 pins the summary to the input path edges") {
    val st = Summarizer.summarize(exampleIdx, scenario, Summarizer.ST(100.0)).subgraph
    val pathEdges = scenario.paths.flatMap(_.hops)
      .map { case (a, b) => if (a <= b) (a, b) else (b, a) }.toSet
    val weighted = st.edges.filter(_.wM > 0) // user-item edges carry weight; w_A = 0
    assert(weighted.forall(e =>
      pathEdges.contains(if (e.src <= e.dst) (e.src, e.dst) else (e.dst, e.src))),
      "with high lambda every weighted summary edge lies on an input path")
  }

  test("PCST connects most terminals with prize 1 / cost 0.25 at 3-hop scale") {
    val r = Summarizer.summarize(exampleIdx, scenario, Summarizer.PCST()).subgraph
    assert(r.edges.nonEmpty)
    assert(r.coveredTerminals.length >= 2)
  }

  test("results carry timing and the memory model (ST grows with |T|, PCST does not)") {
    val st = Summarizer.summarize(exampleIdx, scenario, Summarizer.ST(1.0))
    val pcst = Summarizer.summarize(exampleIdx, scenario, Summarizer.PCST())
    assert(st.timeNs > 0 && pcst.timeNs > 0)
    assert(st.memModelBytes == 4L * exampleIdx.graph.numVertices * 12)  // |T| = 4
    assert(pcst.memModelBytes == exampleIdx.graph.numVertices * 16L)
  }

  test("terminals missing from the graph are skipped, not fatal") {
    // A path to an item that exists in no KG edge (e.g. a hallucinated
    // PLM recommendation): its terminal cannot be resolved and is skipped.
    val ghostItem = repro.kg.NodeIds.item(999)
    val ghostPath = repro.rec.ExplanationPath(TableIExample.User1, ghostItem, 4,
      Vector(TableIExample.User1, TableIExample.UlyssesGaze, ghostItem))
    val withGhost = UserCentric(TableIExample.User1, TableIExample.paths :+ ghostPath)
    val r = Summarizer.summarize(exampleIdx, withGhost, Summarizer.ST(1.0)).subgraph
    assert(r.edges.nonEmpty)
    assert(!r.nodes.contains(ghostItem))
  }

  test("batch API matches serial summarize on ML1M-sim scenarios") {
    val rec = new Pgpr
    val g = mlIdx.graph
    val users = (0 until g.numVertices)
      .filter(v => mlIdx.vtype(v) == NodeType.User && g.degree(v) >= 5).take(4)
    val tasks = users.flatMap { u =>
      val paths = rec.recommend(mlIdx, u, 5, seed = 3L)
      if (paths.isEmpty) None
      else Some((UserCentric(g.ids(u), paths): Scenario, Summarizer.ST(1.0): Summarizer.Method, 5))
    }
    val kgB = spark.sparkContext.broadcast(mlIdx)
    val batch = Summarizer.summarizeBatch(spark.sparkContext, kgB, tasks)
    assert(batch.size == tasks.size)
    tasks.zip(batch.sortBy(_.scenarioId)).foreach { case ((sc, m, k), _) => () }
    val serialById = tasks.map { case (sc, m, k) =>
      sc.id -> Summarizer.summarize(mlIdx, sc, m, k)
    }.toMap
    batch.foreach { r =>
      val s = serialById(r.scenarioId)
      assert(r.subgraph.edges.map(e => (e.src, e.dst)).toSet ==
        s.subgraph.edges.map(e => (e.src, e.dst)).toSet, s"scenario ${r.scenarioId}")
    }
  }

  test("ST on ML1M-sim: summaries are weakly connected per component") {
    val rec = new Pgpr
    val g = mlIdx.graph
    val u = (0 until g.numVertices)
      .find(v => mlIdx.vtype(v) == NodeType.User && g.degree(v) >= 10).get
    val paths = rec.recommend(mlIdx, u, 8, seed = 3L)
    assume(paths.nonEmpty)
    val s = Summarizer.summarize(mlIdx, UserCentric(g.ids(u), paths), Summarizer.ST(1.0)).subgraph
    assert(s.componentCount <= 1 + s.isolated.length)
    assert(s.coveredTerminals.nonEmpty)
  }

  test("method labels are stable identifiers for the harness") {
    assert(Summarizer.ST(100.0).label == "st(λ=100.0)")
    assert(Summarizer.PCST().label == "pcst")
    assert(Summarizer.Paths.label == "paths")
  }
}
