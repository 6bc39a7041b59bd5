package repro.baselines

import repro.SparkSpec
import repro.core._
import repro.roadnet.{RoadNetGen, TrafficModel}

/** Baseline algorithms must be exact: FindKSP ≡ Yen ≡ brute force, and
  * CANDS ≡ Dijkstra — otherwise the performance comparison is meaningless.
  */
class BaselinesSpec extends SparkSpec {

  // ------------------------------------------------------------- FindKSP
  test("FindKSP matches brute force on tiny graphs") {
    for (seed <- 1 to 10) {
      val g = TestGraphs.randomConnected(9, 7, seed)
      val brute = TestGraphs.distances(TestGraphs.bruteKsp(g, 0, 8, 5))
      val got = TestGraphs.distances(new FindKsp(g).ksp(0, 8, 5))
      assert(got == brute, s"seed=$seed")
    }
  }

  test("FindKSP matches Yen on road networks") {
    val g = RoadNetGen.generate(300, seed = 3)
    val fk = new FindKsp(g)
    val rnd = new scala.util.Random(1)
    for (_ <- 1 to 8) {
      val s = rnd.nextInt(g.numVertices); val t = rnd.nextInt(g.numVertices)
      if (s != t) {
        val a = TestGraphs.distances(fk.ksp(s, t, 4))
        val b = TestGraphs.distances(Yen.ksp(g, s, t, 4))
        assert(a == b, s"s=$s t=$t")
      }
    }
  }

  test("FindKSP paths are simple, distinct, ascending, correctly priced") {
    val g = RoadNetGen.generate(200, seed = 4)
    val paths = new FindKsp(g).ksp(1, 180, 6)
    assert(paths.forall(_.isSimple))
    assert(paths.map(_.vertices).distinct.size == paths.size)
    assert(paths.map(_.distance) == paths.map(_.distance).sorted)
    paths.foreach(p => assert(math.abs(g.walkDistance(p.vertices) - p.distance) < 1e-9))
  }

  test("FindKSP handles disconnection and s == t") {
    val g = WeightedGraph.fromEdges(4, Seq((0, 1, 1.0), (2, 3, 1.0)))
    assert(new FindKsp(g).ksp(0, 3, 2).isEmpty)
    assert(new FindKsp(g).ksp(2, 2, 2).map(_.vertices) == Seq(Vector(2)))
  }

  test("FindKSP stays exact after traffic drift") {
    val g = RoadNetGen.generate(200, seed = 5)
    TrafficModel.evolve(g, 0.5, 0.5, rounds = 3)
    val a = TestGraphs.distances(new FindKsp(g).ksp(2, 190, 4))
    val b = TestGraphs.distances(Yen.ksp(g, 2, 190, 4))
    assert(a == b)
  }

  // --------------------------------------------------------------- CANDS
  test("CANDS shortest path matches Dijkstra for many endpoint pairs") {
    val g = RoadNetGen.generate(300, seed = 6)
    val cands = new Cands(Partitioner.partition(g, 30))
    val rnd = new scala.util.Random(2)
    for (_ <- 1 to 12) {
      val s = rnd.nextInt(g.numVertices); val t = rnd.nextInt(g.numVertices)
      val got = cands.shortestPath(s, t).map(_.distance)
      val expect = Dijkstra.shortestPath(g, s, t).map(_.distance)
      assert(got.isDefined == expect.isDefined)
      (got, expect) match {
        case (Some(a), Some(b)) => assert(math.abs(a - b) < 1e-9, s"s=$s t=$t")
        case _ =>
      }
    }
  }

  test("CANDS returns a real path priced at current weights") {
    val g = RoadNetGen.generate(250, seed = 7)
    val cands = new Cands(Partitioner.partition(g, 25))
    val p = cands.shortestPath(3, 200).get
    assert(p.source == 3 && p.target == 200)
    assert(math.abs(g.walkDistance(p.vertices) - p.distance) < 1e-9)
  }

  test("CANDS stays exact after updates (index recomputation)") {
    val g = RoadNetGen.generate(250, seed = 8)
    val part = Partitioner.partition(g, 25)
    val cands = new Cands(part)
    val probe = g.snapshot()
    for (round <- 1 to 3) {
      val batch = TrafficModel.snapshot(probe, 0.4, 0.4, round)
      probe.applyUpdates(batch)
      cands.update(batch)
      val got = cands.shortestPath(5, 190).map(_.distance)
      val expect = Dijkstra.shortestPath(probe, 5, 190).map(_.distance)
      (got, expect) match {
        case (Some(a), Some(b)) => assert(math.abs(a - b) < 1e-9, s"round=$round")
        case (a, b) => assert(a.isDefined == b.isDefined)
      }
    }
  }

  test("CANDS handles s == t and disconnected pairs") {
    val g = WeightedGraph.fromEdges(5, Seq((0, 1, 1.0), (1, 2, 2.0), (3, 4, 1.0)))
    val cands = new Cands(Partitioner.partition(g, 3))
    assert(cands.shortestPath(2, 2).get.distance == 0.0)
    assert(cands.shortestPath(0, 4).isEmpty)
  }

  // ------------------------------------------------- cross-checking all
  test("KSP-DG, Yen, FindKSP agree on the same batch of queries") {
    val g = RoadNetGen.generate(250, seed = 9)
    val dtlp = Dtlp.build(g, z = 25, xi = 3)
    val engine = KspDg.local(dtlp)
    val fk = new FindKsp(g)
    val rnd = new scala.util.Random(11)
    for (_ <- 1 to 6) {
      val s = rnd.nextInt(g.numVertices); val t = rnd.nextInt(g.numVertices)
      if (s != t) {
        val dg = TestGraphs.distances(engine.query(KspQuery(0, s, t, 3)).paths)
        val yen = TestGraphs.distances(Yen.ksp(g, s, t, 3))
        val find = TestGraphs.distances(fk.ksp(s, t, 3))
        assert(dg == yen && find == yen, s"s=$s t=$t")
      }
    }
  }

  test("CANDS k=1 distance equals KSP-DG k=1 distance") {
    val g = RoadNetGen.generate(250, seed = 10)
    val part = Partitioner.partition(g, 25)
    val cands = new Cands(part)
    val dtlp = Dtlp.build(g, z = 25, xi = 2)
    val engine = KspDg.local(dtlp)
    for ((s, t) <- Seq((1, 200), (17, 99), (44, 230))) {
      val a = cands.shortestPath(s, t).map(_.distance).get
      val b = engine.query(KspQuery(0, s, t, 1)).paths.head.distance
      assert(math.abs(a - b) < 1e-9, s"s=$s t=$t")
    }
  }
}
