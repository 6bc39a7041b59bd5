package repro.core

import repro.{KspSqlOracle, SparkSpec}

/** Yen's algorithm vs exhaustive enumeration and the DuckDB path oracle. */
class YenSpec extends SparkSpec {

  test("matches brute force top-5 distances on random graphs") {
    for (seed <- 1 to 20) {
      val g = TestGraphs.randomConnected(9, 7, seed)
      val brute = TestGraphs.distances(TestGraphs.bruteKsp(g, 0, 8, 5))
      val yen = TestGraphs.distances(Yen.ksp(g, 0, 8, 5))
      assert(yen == brute, s"seed=$seed")
    }
  }

  test("matches brute force on grids (many equal-length alternatives)") {
    for (seed <- 1 to 5) {
      val g = TestGraphs.grid(3, 4, seed)
      val brute = TestGraphs.distances(TestGraphs.bruteKsp(g, 0, 11, 8))
      val yen = TestGraphs.distances(Yen.ksp(g, 0, 11, 8))
      assert(yen == brute, s"seed=$seed")
    }
  }

  test("DuckDB recursive-CTE oracle confirms top-k distances") {
    for (seed <- 1 to 3) {
      val g = TestGraphs.randomConnected(8, 5, seed)
      val yen = Yen.ksp(g, 0, 7, 4)
      KspSqlOracle.check(spark, g, 0, 7, 4, yen)
    }
  }

  test("returned paths are simple, distinct, ascending") {
    val g = TestGraphs.randomConnected(25, 20, 3)
    val paths = Yen.ksp(g, 0, 24, 10)
    assert(paths.forall(_.isSimple))
    assert(paths.map(_.vertices).distinct.size == paths.size)
    assert(paths.sliding(2).forall(w => w.size < 2 || w(0).distance <= w(1).distance + 1e-9))
    paths.foreach(p => assert(math.abs(g.walkDistance(p.vertices) - p.distance) < 1e-9))
  }

  test("returns fewer than k when fewer simple paths exist") {
    val g = WeightedGraph.fromEdges(3, Seq((0, 1, 1.0), (1, 2, 1.0)))
    assert(Yen.ksp(g, 0, 2, 5).size == 1)
  }

  test("returns empty when disconnected") {
    val g = WeightedGraph.fromEdges(4, Seq((0, 1, 1.0), (2, 3, 1.0)))
    assert(Yen.ksp(g, 0, 3, 3).isEmpty)
  }

  test("lazy iterator yields the same sequence as batch ksp") {
    val g = TestGraphs.randomConnected(12, 10, 11)
    val batch = Yen.ksp(g, 0, 11, 6)
    val it = new YenIterator(g, 0, 11)
    val lazySeq = Iterator.continually(it.next()).takeWhile(_.isDefined).flatten.take(6).toSeq
    assert(lazySeq.map(_.vertices) == batch.map(_.vertices))
  }

  test("peekDistance equals the next produced distance and does not consume") {
    val g = TestGraphs.randomConnected(12, 10, 12)
    val it = new YenIterator(g, 0, 11)
    for (_ <- 1 to 4) {
      val peeked = it.peekDistance()
      val produced = it.next().map(_.distance)
      assert(peeked == produced)
    }
  }

  test("interiorAllowed excludes forbidden interiors but not endpoints") {
    // 0-1-3 (cheap, via 1) vs 0-2-3 (pricey, via 2)
    val g = WeightedGraph.fromEdges(4, Seq((0, 1, 1.0), (1, 3, 1.0), (0, 2, 5.0), (2, 3, 5.0)))
    val paths = Yen.ksp(g, 0, 3, 3, interiorAllowed = _ != 1)
    assert(paths.map(_.vertices) == Seq(Vector(0, 2, 3)))
    // The ban never applies to the endpoints themselves.
    val fromBanned = Yen.ksp(g, 1, 3, 1, interiorAllowed = _ != 1)
    assert(fromBanned.nonEmpty)
  }

  test("vfrag-count weighting finds fewest-vfrag paths in order") {
    // 0-1-2 has 2+2=4 vfrags; 0-2 has 7 vfrags but may be shorter in time.
    val g = WeightedGraph.fromEdges(3, Seq((0, 1, 2.0), (1, 2, 2.0), (0, 2, 7.0)))
    val byFrag = Yen.ksp(g, 0, 2, 2, weightOf = e => g.vfrags(e).toDouble)
    assert(byFrag.map(_.vertices) == Seq(Vector(0, 1, 2), Vector(0, 2)))
    assert(byFrag.map(_.distance) == Seq(4.0, 7.0))
  }

  test("k=1 equals Dijkstra") {
    for (seed <- 1 to 10) {
      val g = TestGraphs.randomConnected(30, 25, seed)
      val yen = Yen.ksp(g, 0, 29, 1).headOption.map(_.distance)
      val dij = Dijkstra.shortestPath(g, 0, 29).map(_.distance)
      assert(yen == dij, s"seed=$seed")
    }
  }

  test("handles source equal to target") {
    val g = TestGraphs.randomConnected(5, 2, 1)
    val p = Yen.ksp(g, 3, 3, 4)
    assert(p == Seq(Path(Vector(3), Vector.empty, 0.0)))
  }
}
