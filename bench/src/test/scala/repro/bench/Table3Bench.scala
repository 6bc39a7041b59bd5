package repro.bench

import repro.core.Partitioner
import repro.roadnet.RoadNetGen

/** Table 3: number of vertices in the skeleton graph `G_λ` as z varies —
  * five z values per network (paper's sweeps scaled ÷4, DESIGN.md §7).
  * The paper's key shape: |G_λ| decreases monotonically as z grows.
  */
class Table3Bench extends BenchHarness {

  private val zSweep = Map(
    "NY-lite" -> Seq(25, 37, 50, 62, 75),
    "COL-lite" -> Seq(25, 37, 50, 62, 75),
    "FLA-lite" -> Seq(87, 100, 112, 125, 137),
    "CUSA-lite" -> Seq(200, 225, 250, 275, 300))

  private val paper = Map(
    "NY-lite" -> Seq(32534, 27668, 24461, 22604, 20775),
    "COL-lite" -> Seq(36831, 30886, 27655, 25329, 23271),
    "FLA-lite" -> Seq(60125, 57085, 54695, 52640, 50411),
    "CUSA-lite" -> Seq(601250, 561085, 514618, 495606, 480801)) // first CUSA cell corrected from the OCR'd table

  test("Table 3: |G_lambda| with varying z") {
    val rows = RoadNetGen.all.map { cfg =>
      val g = RoadNetGen.generate(cfg)
      val zs = zSweep(cfg.name)
      val sizes = zs.map(z => Partitioner.partition(g, z).boundaryVertices.length)
      // Shape: |G_λ| shrinks as z grows (paper's headline observation).
      assert(sizes == sizes.sorted.reverse, s"${cfg.name}: $sizes not decreasing")
      Seq(cfg.name,
        zs.zip(sizes).map { case (z, s) => s"z=$z: $s" }.mkString(", "),
        s"paper (z ÷4 scale): ${paper(cfg.name).mkString(", ")}")
    }
    table("Table 3 (measured |G_lambda| per z vs paper)",
      Seq("network", "measured", "paper full-size"), rows)
  }
}
