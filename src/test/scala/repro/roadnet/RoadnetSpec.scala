package repro.roadnet

import repro.{Oracle, SparkSpec}
import repro.core.{Dijkstra, WeightedGraph}

/** Synthetic road networks and the traffic model (dataset substitutions). */
class RoadnetSpec extends SparkSpec {

  test("generated network is connected") {
    val g = RoadNetGen.generate(500, seed = 1)
    val res = Dijkstra.run(g, 0)
    assert(res.dist.forall(_.isFinite))
  }

  test("deterministic in (n, seed)") {
    val a = RoadNetGen.generate(300, seed = 5)
    val b = RoadNetGen.generate(300, seed = 5)
    assert(a.numVertices == b.numVertices && a.numEdges == b.numEdges)
    assert(a.edges.toSeq == b.edges.toSeq)
    assert(a.initialWeights.toSeq == b.initialWeights.toSeq)
    val c = RoadNetGen.generate(300, seed = 6)
    assert(c.initialWeights.toSeq != a.initialWeights.toSeq)
  }

  test("road-like sparsity: average degree between 2 and 4") {
    val g = RoadNetGen.generate(2000, seed = 2)
    val avgDeg = 2.0 * g.numEdges / g.numVertices
    assert(avgDeg > 2.0 && avgDeg < 4.0, s"avgDeg=$avgDeg")
  }

  test("integer travel times within the configured range") {
    val g = RoadNetGen.generate(400, seed = 3, minTime = 5, maxTime = 100)
    g.initialWeights.foreach { w =>
      assert(w == math.rint(w))
      assert(w >= 5 && w <= 100)
    }
  }

  test("named lite configs have the documented sizes") {
    RoadNetGen.all.foreach { cfg =>
      val g = RoadNetGen.generate(cfg)
      // grid rounding may add a sliver of extra vertices
      assert(g.numVertices >= cfg.vertices && g.numVertices <= cfg.vertices * 1.02 + 200,
        s"${cfg.name}: ${g.numVertices} vs ${cfg.vertices}")
    }
  }

  test("traffic snapshot changes roughly an alpha fraction of edges") {
    val g = RoadNetGen.generate(3000, seed = 4)
    val batch = TrafficModel.snapshot(g, alpha = 0.35, tau = 0.3, round = 1)
    val frac = batch.size.toDouble / g.numEdges
    assert(frac > 0.30 && frac < 0.40, s"frac=$frac")
  }

  test("traffic variation respects tau and the clamp envelope") {
    val g = RoadNetGen.generate(1000, seed = 5)
    val batch = TrafficModel.snapshot(g, alpha = 0.5, tau = 0.3, round = 1)
    batch.foreach { u =>
      val old = g.weights(u.edgeId)
      val ratio = u.newWeight / old
      assert(ratio >= 0.69 && ratio <= 1.31, s"ratio=$ratio") // 1 ± tau (within clamp)
    }
  }

  test("weights stay within [0.2 w0, 5 w0] under long evolution") {
    val g = RoadNetGen.generate(500, seed = 6)
    TrafficModel.evolve(g, alpha = 0.6, tau = 0.6, rounds = 30)
    (0 until g.numEdges).foreach { e =>
      assert(g.weights(e) >= 0.2 * g.initialWeights(e) - 1e-9)
      assert(g.weights(e) <= 5.0 * g.initialWeights(e) + 1e-9)
      assert(g.weights(e) > 0)
    }
  }

  test("snapshots are deterministic and differ across rounds") {
    val g = RoadNetGen.generate(500, seed = 7)
    val a = TrafficModel.snapshot(g, 0.3, 0.3, round = 1)
    val b = TrafficModel.snapshot(g, 0.3, 0.3, round = 1)
    val c = TrafficModel.snapshot(g, 0.3, 0.3, round = 2)
    assert(a == b)
    assert(a.map(_.edgeId).toSet != c.map(_.edgeId).toSet)
  }

  test("update deltas are consistent: new = old + delta") {
    val g = RoadNetGen.generate(400, seed = 8)
    val batch = TrafficModel.snapshot(g, 0.4, 0.4, round = 3)
    batch.foreach(u => assert(math.abs((g.weights(u.edgeId) + u.delta) - u.newWeight) < 1e-12))
  }

  test("oracle: per-edge weight envelope verified in SQL") {
    val g = RoadNetGen.generate(400, seed = 9)
    TrafficModel.evolve(g, 0.5, 0.5, rounds = 5)
    val df = g.edgesDf(spark)
    Oracle.assertEquivalent(
      df.where("w < 0.2 * w0 - 1e-9 OR w > 5.0 * w0 + 1e-9")
        .selectExpr("CAST(count(*) AS BIGINT) AS violations"),
      """SELECT count(*) AS violations FROM edges
        |WHERE CAST(w AS DOUBLE) < 0.2 * CAST(w0 AS DOUBLE) - 1e-9
        |   OR CAST(w AS DOUBLE) > 5.0 * CAST(w0 AS DOUBLE) + 1e-9""".stripMargin,
      "edges" -> df)
  }
}
