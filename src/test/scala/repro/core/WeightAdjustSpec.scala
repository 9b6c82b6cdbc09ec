package repro.core

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}
import repro.eval.TableIExample
import repro.kg.KgIndex

class WeightAdjustSpec extends SparkSpec {

  private lazy val kg  = TableIExample.knowledgeGraph(spark)
  private lazy val idx = KgIndex.fromKGraph(kg)
  private lazy val paths = TableIExample.paths

  test("overlay boosts exactly the edges on the paths") {
    val overlay = WeightAdjust.overlay(idx, paths, anchors = 3, lambda = 1.0)
    val pathEdges = paths.flatMap(_.hops).flatMap { case (a, b) => idx.edgeBetween(a, b) }.toSet
    assert(overlay.keySet().size() == pathEdges.size)
    pathEdges.foreach(e => assert(overlay.containsKey(e)))
  }

  test("overlay math: w_M * (1 + lambda * freq / |S|)") {
    val overlay = WeightAdjust.overlay(idx, paths, anchors = 3, lambda = 3.0)
    // User 1 -> Ulysses' Gaze appears in exactly one of the three paths,
    // and its rating is 5.0 -> w = 5 * (1 + 3 * 1/3) = 10.
    val e = idx.edgeBetween(TableIExample.User1, TableIExample.UlyssesGaze).get
    assert(math.abs(overlay.get(e) - 10.0) < 1e-12)
  }

  test("lambda = 0 leaves weights unchanged") {
    val overlay = WeightAdjust.overlay(idx, paths, anchors = 3, lambda = 0.0)
    overlay.forEach { (e, w) =>
      assert(math.abs(w - idx.graph.edgeWeight(e)) < 1e-12)
    }
  }

  test("an edge shared by two paths gets double the boost of a single-path edge") {
    // Theo Angelopoulos is reached by both P_{1,B} and P_{1,C} via
    // different edges; Drama -> Eternity appears once. Craft a synthetic
    // check: duplicate path P_{1,B} so its edges are in 2 paths.
    val doubled = paths :+ paths(1).copy(rank = 4)
    val overlay = WeightAdjust.overlay(idx, doubled, anchors = 4, lambda = 1.0)
    val shared = idx.edgeBetween(TableIExample.User1, TableIExample.UlyssesGaze).get
    val single = idx.edgeBetween(TableIExample.User1, TableIExample.LandscapeInTheMist).get
    val wShared = overlay.get(shared) / idx.graph.edgeWeight(shared) - 1.0 // = lambda*2/4
    val wSingle = overlay.get(single) / idx.graph.edgeWeight(single) - 1.0 // = lambda*1/4
    assert(math.abs(wShared - 2 * wSingle) < 1e-12)
  }

  test("hops that are not KG edges boost nothing (PLM hallucinations)") {
    // User1 -> Drama is a hallucinated hop; Ulysses' Gaze -> Drama too;
    // only Drama -> Eternity is a real KG edge.
    val fake = repro.rec.ExplanationPath(TableIExample.User1, TableIExample.EternityAndADay, 1,
      Vector(TableIExample.User1, TableIExample.Drama, TableIExample.EternityAndADay))
    assert(idx.edgeBetween(TableIExample.User1, TableIExample.Drama).isEmpty)
    assert(idx.edgeBetween(TableIExample.Drama, TableIExample.EternityAndADay).isDefined)
    val overlay = WeightAdjust.overlay(idx, Seq(fake), anchors = 1, lambda = 5.0)
    assert(overlay.keySet().size() == 1)
    assert(overlay.containsKey(
      idx.edgeBetween(TableIExample.Drama, TableIExample.EternityAndADay).get))
  }

  test("an edge repeated inside one path counts once for that path") {
    // Path that walks the same edge back and forth.
    val p = repro.rec.ExplanationPath(TableIExample.User1, TableIExample.UlyssesGaze, 1,
      Vector(TableIExample.User1, TableIExample.UlyssesGaze, TableIExample.User1,
        TableIExample.UlyssesGaze))
    val overlay = WeightAdjust.overlay(idx, Seq(p), anchors = 1, lambda = 1.0)
    val e = idx.edgeBetween(TableIExample.User1, TableIExample.UlyssesGaze).get
    // freq = 1 (one path), not 3 (three traversals): w = 5 * (1 + 1) = 10.
    assert(math.abs(overlay.get(e) - 10.0) < 1e-12)
  }

  test("DataFrame form matches the overlay kernel on every path edge") {
    import spark.implicits._
    val hops = paths.zipWithIndex.flatMap { case (p, i) =>
      p.hops.map { case (a, b) => (i.toLong, a, b) }
    }.toDF("path_id", "src", "dst")
    val adj = WeightAdjust.adjustedEdges(kg.edges, hops, anchors = 3, lambda = 2.0)
      .select("src", "dst", "adj_weight").collect()
      .map(r => (r.getLong(0), r.getLong(1)) -> r.getDouble(2)).toMap

    val overlay = WeightAdjust.overlay(idx, paths, anchors = 3, lambda = 2.0)
    val g = idx.graph
    overlay.forEach { (e, w) =>
      val keyed = adj((g.ids(g.edgeSrc(e)), g.ids(g.edgeDst(e))))
      assert(math.abs(keyed - w) < 1e-9, s"edge $e: df=$keyed kernel=$w")
    }
    // Non-path edges keep base weight.
    val nonPath = adj.view.filterKeys { case (s, d) =>
      idx.edgeBetween(s, d).forall(e => !overlay.containsKey(e))
    }
    nonPath.foreach { case ((s, d), w) =>
      val e = idx.edgeBetween(s, d).get
      assert(math.abs(w - g.edgeWeight(e)) < 1e-9)
    }
  }

  test("oracle: Eq.(1) frequency join matches DuckDB SQL") {
    import spark.implicits._
    val hops = paths.zipWithIndex.flatMap { case (p, i) =>
      p.hops.map { case (a, b) => (i.toLong, a, b) }
    }.toDF("path_id", "src", "dst")
    val sparkDf = WeightAdjust.adjustedEdges(kg.edges, hops, anchors = 3, lambda = 2.0)
      .select(col("src"), col("dst"), round(col("adj_weight"), 6) as "w")
    Oracle.assertEquivalent(sparkDf,
      """SELECT e.src, e.dst,
        |  ROUND(CAST(e.weight AS DOUBLE) * (1 + 2.0 * COALESCE(f.n, 0) / 3.0), 6) AS w
        |FROM edges e LEFT JOIN (
        |  SELECT a, b, COUNT(*) AS n FROM (
        |    SELECT DISTINCT path_id,
        |      LEAST(CAST(src AS BIGINT), CAST(dst AS BIGINT)) AS a,
        |      GREATEST(CAST(src AS BIGINT), CAST(dst AS BIGINT)) AS b
        |    FROM hops) GROUP BY a, b
        |) f ON LEAST(CAST(e.src AS BIGINT), CAST(e.dst AS BIGINT)) = f.a
        |   AND GREATEST(CAST(e.src AS BIGINT), CAST(e.dst AS BIGINT)) = f.b""".stripMargin,
      "edges" -> kg.edges.select("src", "dst", "weight"), "hops" -> hops)
  }
}
