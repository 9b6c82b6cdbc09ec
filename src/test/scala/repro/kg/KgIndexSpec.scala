package repro.kg

import repro.SparkSpec

class KgIndexSpec extends SparkSpec {

  private lazy val kg = KGBuilder.build(spark, MLSynth.ml1m(spark, scale = 0.05))
  private lazy val idx = KgIndex.fromKGraph(kg)

  test("vertex types partition the graph") {
    val counts = idx.vtype.groupBy(identity).view.mapValues(_.length).toMap
    assert(counts(NodeType.User) > 0 && counts(NodeType.Item) > 0 && counts(NodeType.External) > 0)
    assert(counts.values.sum == idx.graph.numVertices)
  }

  test("vertex type agrees with the id range for every vertex") {
    (0 until idx.graph.numVertices).foreach { v =>
      assert(idx.vtype(v) == NodeIds.typeOf(idx.graph.ids(v)))
    }
  }

  test("edgeBetween finds edges in both orientations") {
    val g = idx.graph
    val e = 0
    val (s, d) = (g.ids(g.edgeSrc(e)), g.ids(g.edgeDst(e)))
    assert(idx.edgeBetween(s, d).isDefined)
    assert(idx.edgeBetween(d, s).isDefined)
    assert(idx.edgeBetween(s, d) == idx.edgeBetween(d, s))
  }

  test("edgeBetween returns None for non-edges and unknown nodes") {
    assert(idx.edgeBetween(NodeIds.user(1), NodeIds.user(2)).isEmpty) // no user-user edges
    assert(idx.edgeBetween(123_456_789L, NodeIds.user(1)).isEmpty)
  }

  test("ratedItems: only item neighbours, sorted by descending weight") {
    val g = idx.graph
    val u = (0 until g.numVertices).find(v => idx.vtype(v) == NodeType.User && g.degree(v) > 2).get
    val rated = idx.ratedItems(u)
    assert(rated.nonEmpty)
    rated.foreach { case (v, e) =>
      assert(idx.vtype(v) == NodeType.Item)
      assert(g.edgeSrc(e) == u || g.edgeDst(e) == u)
    }
    val ws = rated.map { case (_, e) => g.edgeWeight(e) }
    assert(ws.zip(ws.tail).forall { case (a, b) => a >= b })
  }

  test("ratedItemSet matches ratedItems") {
    val g = idx.graph
    val u = (0 until g.numVertices).find(v => idx.vtype(v) == NodeType.User && g.degree(v) > 0).get
    val set = idx.ratedItemSet(u)
    val arr = idx.ratedItems(u).map(_._1).toSet
    assert(arr == (0 until g.numVertices).filter(v => set.contains(v)).toSet)
  }

  test("byPopularity is sorted by descending degree within each type") {
    val g = idx.graph
    Seq(NodeType.User, NodeType.Item, NodeType.External).foreach { t =>
      val pop = idx.byPopularity(t)
      assert(pop.forall(v => idx.vtype(v) == t))
      val degs = pop.map(g.degree)
      assert(degs.zip(degs.tail).forall { case (a, b) => a >= b })
    }
  }

  test("maxBaseWeight is the max over all edges") {
    assert(idx.maxBaseWeight == idx.graph.edgeWeight.max)
    assert(idx.maxBaseWeight <= 5.0 + 1e-9) // beta1=1, beta2=0 default
  }

  test("index survives java serialization (broadcast path)") {
    val bytes = {
      val bos = new java.io.ByteArrayOutputStream()
      val oos = new java.io.ObjectOutputStream(bos)
      oos.writeObject(idx); oos.close(); bos.toByteArray
    }
    val back = new java.io.ObjectInputStream(new java.io.ByteArrayInputStream(bytes))
      .readObject().asInstanceOf[KgIndex]
    assert(back.graph.numVertices == idx.graph.numVertices)
    val g = idx.graph
    val (s, d) = (g.ids(g.edgeSrc(0)), g.ids(g.edgeDst(0)))
    assert(back.edgeBetween(s, d) == idx.edgeBetween(s, d)) // lazy lookup rebuilt
  }
}
