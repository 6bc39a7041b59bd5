package repro.jobs

import repro.core.Partitioner
import repro.roadnet.RoadNetGen

/** Reproduce Table 3 (#vertices of the skeleton graph with varying z).
  *
  * Usage: spark-submit --class repro.jobs.Table3Job <jar> [networks...]
  */
object Table3Job {

  /** Five z values per network: the paper's sweeps scaled by 1/4 (DESIGN.md §7). */
  def zSweep(name: String): Seq[Int] = name match {
    case "NY-lite" | "COL-lite" => Seq(25, 37, 50, 62, 75)
    case "FLA-lite" => Seq(87, 100, 112, 125, 137)
    case "CUSA-lite" => Seq(200, 225, 250, 275, 300)
    case _ => Seq(25, 50, 75, 100, 125)
  }

  def main(args: Array[String]): Unit = {
    val spark = JobUtil.session("table3")
    val cfgs = if (args.isEmpty) RoadNetGen.all
               else RoadNetGen.all.filter(c => args.exists(_.equalsIgnoreCase(c.name)))
    cfgs.foreach { cfg =>
      val g = RoadNetGen.generate(cfg)
      val zs = zSweep(cfg.name)
      val sizes = zs.map { z =>
        // |G_λ| is the number of boundary vertices — no bounding paths needed.
        Partitioner.partition(g, z).boundaryVertices.length
      }
      println(s"| G_lambda (${cfg.name}) | " + zs.zip(sizes).map { case (z, s) => s"z=$z: $s" }.mkString(" | ") + " |")
    }
    spark.stop()
  }
}
