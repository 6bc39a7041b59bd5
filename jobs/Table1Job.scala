package repro.jobs

import repro.core.Partitioner
import repro.roadnet.RoadNetGen

/** Reproduce Table 1 (road-network statistics) on the lite networks.
  *
  * Usage: spark-submit --class repro.jobs.Table1Job <jar> [networks...]
  */
object Table1Job {
  def main(args: Array[String]): Unit = {
    val spark = JobUtil.session("table1")
    val cfgs = if (args.isEmpty) RoadNetGen.all
               else RoadNetGen.all.filter(c => args.exists(_.equalsIgnoreCase(c.name)))
    println("| road network | #vertices | #edges | z | #subgraphs (n_b>5) | G_lambda |")
    println("|---|---|---|---|---|---|")
    cfgs.foreach { cfg =>
      val g = RoadNetGen.generate(cfg)
      // Table 1 needs only the partitioning: |G_λ| is the boundary count.
      val p = Partitioner.partition(g, cfg.defaultZ)
      val big = p.subgraphs.count(_.boundaryIds.length > 5)
      println(s"| ${cfg.name} | ${g.numVertices} | ${g.numEdges} | ${cfg.defaultZ} " +
        s"| ${p.subgraphs.size} ($big) | ${p.boundaryVertices.length} |")
    }
    spark.stop()
  }
}
