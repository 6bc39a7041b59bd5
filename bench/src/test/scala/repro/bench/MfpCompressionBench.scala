package repro.bench

import repro.core._
import repro.mfp.CompressedEpIndex
import repro.roadnet.RoadNetGen

/** Section 4's storage claim: the LSH-grouped MFP-trees compress the
  * duplicated bounding-path lists of the EP-Index.
  */
class MfpCompressionBench extends BenchHarness {

  test("MFP-tree compression ratio over EP-Index storage") {
    val g = RoadNetGen.generate(RoadNetGen.NyLite)
    val part = Partitioner.partition(g, 50)
    // Sample the 12 boundary-heaviest subgraphs (most duplication).
    val samples = part.subgraphs.sortBy(-_.boundaryIds.length).take(12)
    val rows = samples.take(4).map { sg =>
      val idx = new SubgraphDtlp(sg, xi = 8)
      val comp = new CompressedEpIndex(idx.epPaths)
      Seq(sg.id, sg.boundaryIds.length, comp.flatElements, comp.storageNodes,
        f"${comp.storageNodes.toDouble / math.max(1L, comp.flatElements)}%.2f")
    }
    val totals = samples.map { sg =>
      val idx = new SubgraphDtlp(sg, xi = 8)
      val comp = new CompressedEpIndex(idx.epPaths)
      (comp.flatElements, comp.storageNodes)
    }
    val (flatSum, nodeSum) = totals.foldLeft((0L, 0L)) { case ((a, b), (f, n)) => (a + f, b + n) }
    table("MFP-tree compression (NY-lite, z=50, xi=8; 12 boundary-heaviest subgraphs)",
      Seq("subgraph", "#boundary", "EP elements", "MFP nodes", "ratio"),
      rows :+ Seq("TOTAL(12)", "-", flatSum, nodeSum, f"${nodeSum.toDouble / flatSum}%.2f"))
    assert(nodeSum < flatSum, "MFP-trees should store fewer nodes than flat EP elements")
  }
}
