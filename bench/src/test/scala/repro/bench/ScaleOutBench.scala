package repro.bench

import repro.core._
import repro.dist.{SparkDtlp, SparkKspEngine}
import repro.roadnet.RoadNetGen

/** Figures 42–46 shape: horizontal scalability. "Servers" are emulated by
  * repartitioning the subgraph-index Dataset into N partitions and capping
  * the engine's query-worker threads at N (DESIGN.md §2) — network latency
  * is out of scope, work-partitioning is in.
  */
class ScaleOutBench extends BenchHarness {

  test("Figure 42 shape: DTLP build time vs number of workers") {
    val g = RoadNetGen.generate(RoadNetGen.NyLite)
    // Warm-up build: JIT-compile the whole index path before measuring.
    SparkDtlp.build(spark, g.snapshot(), 50, 8, LbdMode.Faithful, numWorkers = 4).close()
    val rows = Seq(1, 4, 16).map { n =>
      val (dtlp, secs) = timeS(SparkDtlp.build(spark, g.snapshot(), 50, 8, LbdMode.Faithful, numWorkers = n))
      dtlp.close()
      Seq(n, fmt(secs))
    }
    table("DTLP build vs #workers (NY-lite, z=50, xi=8) — paper: decreasing with more servers",
      Seq("workers", "build s"), rows)
    val times = rows.map(_(1).toString.toDouble)
    assert(times.last < times.head, s"build did not scale out: $times")
  }

  test("Figure 43/44 shape: query batch time vs number of workers and k") {
    val g = RoadNetGen.generate(RoadNetGen.NyLite)
    val dtlp = SparkDtlp.build(spark, g, 50, 8, LbdMode.Faithful, numWorkers = 16)
    val rnd = new scala.util.Random(41)
    val pairs = (1 to 24).map(_ => (rnd.nextInt(g.numVertices), rnd.nextInt(g.numVertices)))
      .filter { case (s, t) => s != t }
    val rows = for (workers <- Seq(1, 4, 16); k <- Seq(2, 5)) yield {
      val resized = if (workers == 16) dtlp else dtlp.withWorkers(workers)
      val engine = SparkKspEngine(resized, maxIterations = 1500, queryParallelism = workers)
      val qs = pairs.zipWithIndex.map { case ((s, t), i) => KspQuery(i, s, t, k) }
      val (_, secs) = timeS(engine.batch(qs))
      Seq(workers, k, fmt(secs))
    }
    table("Query batch (24 queries) vs #workers and k (NY-lite, z=50, xi=8) — paper: time drops with more servers for every k",
      Seq("workers", "k", "batch s"), rows)
    // Shape: 16 workers beat 1 worker at k=2.
    val t1 = rows.find(r => r(0) == 1 && r(1) == 2).get(2).toString.toDouble
    val t16 = rows.find(r => r(0) == 16 && r(1) == 2).get(2).toString.toDouble
    assert(t16 < t1, s"no scale-out speedup: 1w=$t1 16w=$t16")
  }
}
