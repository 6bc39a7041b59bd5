package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.core.WeightedGraph
import repro.roadnet.RoadNetGen

/** Shared plumbing for the spark-submit entrypoints in `jobs/`. */
object JobUtil {

  def session(app: String): SparkSession =
    SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(app)
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()

  /** Resolve a network by name ("NY-lite", "COL-lite", "FLA-lite",
    * "CUSA-lite") or by an explicit vertex count ("v:5000").
    */
  def network(name: String): (String, WeightedGraph, Int) =
    if (name.startsWith("v:")) {
      val n = name.drop(2).toInt
      (s"synthetic-$n", RoadNetGen.generate(n), math.max(10, n / 250))
    } else {
      val cfg = RoadNetGen.all.find(_.name.equalsIgnoreCase(name))
        .getOrElse(sys.error(s"unknown network '$name'; use ${RoadNetGen.all.map(_.name).mkString(", ")} or v:<count>"))
      (cfg.name, RoadNetGen.generate(cfg), cfg.defaultZ)
    }

  def time[T](body: => T): (T, Double) = {
    val t0 = System.nanoTime()
    val r = body
    (r, (System.nanoTime() - t0) / 1e9)
  }
}
