package repro.core

import repro.SparkSpec

/** Structural invariants of [[WeightedGraph]]. */
class GraphSpec extends SparkSpec {

  private def diamond: WeightedGraph =
    WeightedGraph.fromEdges(4, Seq((0, 1, 2.0), (1, 3, 3.0), (0, 2, 4.0), (2, 3, 1.0), (0, 3, 10.0)))

  test("edge count and vertex count") {
    val g = diamond
    assert(g.numVertices == 4)
    assert(g.numEdges == 5)
  }

  test("degrees follow adjacency") {
    val g = diamond
    assert(g.degree(0) == 3)
    assert(g.degree(1) == 2)
    assert(g.degree(3) == 3)
  }

  test("foreachNeighbor enumerates each incident edge once") {
    val g = diamond
    var seen = List.empty[(Int, Int)]
    g.foreachNeighbor(0) { (u, e) => seen ::= (u, e) }
    assert(seen.map(_._1).sorted == List(1, 2, 3))
    assert(seen.map(_._2).distinct.size == 3)
  }

  test("canonicalizes endpoints so u < v") {
    val g = WeightedGraph.fromEdges(3, Seq((2, 0, 1.0), (1, 2, 1.0)))
    assert(g.edges.forall(e => e.u < e.v))
  }

  test("rejects self loops") {
    assertThrows[IllegalArgumentException](WeightedGraph.fromEdges(2, Seq((1, 1, 1.0))))
  }

  test("rejects duplicate edges regardless of direction") {
    assertThrows[IllegalArgumentException](
      WeightedGraph.fromEdges(3, Seq((0, 1, 1.0), (1, 0, 2.0))))
  }

  test("rejects non-positive weights") {
    assertThrows[IllegalArgumentException](WeightedGraph.fromEdges(2, Seq((0, 1, 0.0))))
  }

  test("rejects out-of-range vertices") {
    assertThrows[IllegalArgumentException](WeightedGraph.fromEdges(2, Seq((0, 2, 1.0))))
  }

  test("vfrags equal rounded initial weights, at least 1") {
    val g = WeightedGraph.fromEdges(3, Seq((0, 1, 0.4), (1, 2, 2.6)))
    assert(g.vfrags.toSeq == Seq(1, 3))
  }

  test("vfrags never change when weights do") {
    val g = diamond
    val before = g.vfrags.toSeq
    g.applyUpdates(Seq(WeightUpdate(0, 17.0, 15.0)))
    assert(g.vfrags.toSeq == before)
    assert(g.weights(0) == 17.0)
    assert(g.initialWeights(0) == 2.0)
  }

  test("unit weight is current weight spread over vfrags") {
    val g = diamond
    g.applyUpdates(Seq(WeightUpdate(1, 1.5, -1.5))) // w0=3 → vfrags 3
    assert(math.abs(g.unitWeight(1) - 0.5) < 1e-12)
  }

  test("edgeBetween finds edges in both directions") {
    val g = diamond
    assert(g.edgeBetween(0, 1) == g.edgeBetween(1, 0))
    assert(g.edgeBetween(1, 2).isEmpty)
  }

  test("walkDistance sums current weights") {
    val g = diamond
    assert(g.walkDistance(Vector(0, 1, 3)) == 5.0)
    g.applyUpdates(Seq(WeightUpdate(0, 7.0, 5.0)))
    assert(g.walkDistance(Vector(0, 1, 3)) == 10.0)
  }

  test("snapshot decouples current weights") {
    val g = diamond
    val snap = g.snapshot()
    g.applyUpdates(Seq(WeightUpdate(0, 9.0, 7.0)))
    assert(snap.weights(0) == 2.0)
    assert(g.weights(0) == 9.0)
  }

  test("edgesDf matches the DuckDB view of the same edges") {
    val g = diamond
    val df = g.edgesDf(spark)
    repro.Oracle.assertEquivalent(
      df.selectExpr("count(*) AS n", "round(sum(w), 4) AS total_w"),
      "SELECT count(*) AS n, round(sum(CAST(w AS DOUBLE)), 4) AS total_w FROM edges",
      "edges" -> df)
  }

  test("path concatenation joins at shared endpoint") {
    val p1 = Path(Vector(0, 1), Vector(0), 2.0)
    val p2 = Path(Vector(1, 3), Vector(1), 3.0)
    val joined = p1 ++ p2
    assert(joined.vertices == Vector(0, 1, 3))
    assert(joined.distance == 5.0)
    assertThrows[IllegalArgumentException](p2 ++ p1.copy(vertices = Vector(0, 2)))
  }

  test("path simplicity detection") {
    assert(Path(Vector(0, 1, 2), Vector(0, 1), 1.0).isSimple)
    assert(!Path(Vector(0, 1, 0), Vector(0, 0), 1.0).isSimple)
  }

  test("repriced recomputes distance from current weights") {
    val g = diamond
    val p = Path(Vector(0, 1, 3), Vector(0, 1), 5.0)
    g.applyUpdates(Seq(WeightUpdate(0, 4.0, 2.0)))
    assert(p.repriced(g).distance == 7.0)
  }
}
