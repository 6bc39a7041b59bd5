package repro.core

import repro.SparkSpec

/** Dijkstra vs brute-force enumeration, plus ban semantics. */
class DijkstraSpec extends SparkSpec {

  test("matches brute force on random graphs") {
    for (seed <- 1 to 15) {
      val g = TestGraphs.randomConnected(9, 6, seed)
      for (s <- 0 until 3; t <- 4 until 7) {
        val brute = TestGraphs.bruteKsp(g, s, t, 1).headOption.map(_.distance)
        val dij = Dijkstra.shortestPath(g, s, t).map(_.distance)
        assert(dij == brute, s"seed=$seed s=$s t=$t")
      }
    }
  }

  test("full run distances match per-target runs") {
    val g = TestGraphs.randomConnected(20, 12, 99)
    val res = Dijkstra.run(g, 0)
    for (t <- 1 until 20)
      assert(Dijkstra.shortestPath(g, 0, t).map(_.distance).contains(res.dist(t)))
  }

  test("reconstructed path is consistent with its distance") {
    val g = TestGraphs.randomConnected(15, 10, 5)
    for (t <- 1 until 15) {
      val p = Dijkstra.shortestPath(g, 0, t).get
      assert(math.abs(g.walkDistance(p.vertices) - p.distance) < 1e-9)
      assert(p.isSimple)
      assert(p.source == 0 && p.target == t)
    }
  }

  test("banned vertices are avoided except endpoints") {
    // line 0-1-2 plus detour 0-3-2
    val g = WeightedGraph.fromEdges(4, Seq((0, 1, 1.0), (1, 2, 1.0), (0, 3, 5.0), (3, 2, 5.0)))
    val p = Dijkstra.shortestPath(g, 0, 2, bannedVertex = _ == 1).get
    assert(p.vertices == Vector(0, 3, 2))
    // Ban on the target itself is ignored.
    val q = Dijkstra.shortestPath(g, 0, 2, bannedVertex = v => v == 2 || v == 1).get
    assert(q.vertices == Vector(0, 3, 2))
  }

  test("banned edges are avoided") {
    val g = WeightedGraph.fromEdges(3, Seq((0, 1, 1.0), (1, 2, 1.0), (0, 2, 10.0)))
    val direct = g.edgeBetween(0, 1).get
    val p = Dijkstra.shortestPath(g, 0, 2, bannedEdge = _ == direct).get
    assert(p.vertices == Vector(0, 2))
    assert(p.distance == 10.0)
  }

  test("unreachable target yields None") {
    val g = WeightedGraph.fromEdges(4, Seq((0, 1, 1.0), (2, 3, 1.0)))
    assert(Dijkstra.shortestPath(g, 0, 3).isEmpty)
  }

  test("custom weight function (vfrag counts) is honored") {
    // two routes: short hops with high weight vs one heavy edge
    val g = WeightedGraph.fromEdges(3, Seq((0, 1, 9.0), (1, 2, 9.0), (0, 2, 20.0)))
    val byFrag = Dijkstra.shortestPath(g, 0, 2, weightOf = e => g.vfrags(e).toDouble).get
    assert(byFrag.vertices == Vector(0, 1, 2)) // 18 vfrags < 20 vfrags
    val byWeight = Dijkstra.shortestPath(g, 0, 2).get
    assert(byWeight.vertices == Vector(0, 1, 2))
  }

  test("source equals target") {
    val g = TestGraphs.randomConnected(5, 3, 1)
    val p = Dijkstra.shortestPath(g, 2, 2).get
    assert(p.vertices == Vector(2) && p.distance == 0.0)
  }
}
