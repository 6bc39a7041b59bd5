package repro

import org.apache.spark.sql.SparkSession
import repro.core.{Path, WeightedGraph}

/** DuckDB-backed KSP oracle: enumerates simple paths with a recursive CTE
  * over the edge table and checks our top-k distances against DuckDB's.
  * Exponential — use only on tiny graphs (≤ ~14 vertices).
  */
object KspSqlOracle {

  /** Assert that `paths` are exactly the k shortest simple-path distances
    * from `s` to `t` in `g`, according to DuckDB.
    */
  def check(spark: SparkSession, g: WeightedGraph, s: Int, t: Int, k: Int, paths: Seq[Path]): Unit = {
    import spark.implicits._
    // Both directions of each undirected edge.
    val edges = g.edges.indices.flatMap { i =>
      val e = g.edges(i); val w = g.weights(i)
      Seq((e.u, e.v, w), (e.v, e.u, w))
    }.toDF("eu", "ev", "ew")

    val got = paths.zipWithIndex
      .map { case (p, i) => (i + 1, math.rint(p.distance * 1e4) / 1e4) }
      .toDF("rank", "dist")

    val sql =
      s"""WITH RECURSIVE walks(v, path, dist) AS (
         |  SELECT $s, '/' || $s || '/', CAST(0 AS DOUBLE)
         |  UNION ALL
         |  SELECT CAST(e.ev AS INTEGER),
         |         w.path || e.ev || '/',
         |         w.dist + CAST(e.ew AS DOUBLE)
         |  FROM walks w JOIN edges e ON CAST(e.eu AS INTEGER) = w.v
         |  WHERE position('/' || e.ev || '/' IN w.path) = 0
         |)
         |SELECT CAST(row_number() OVER (ORDER BY dist) AS INTEGER) AS rank,
         |       round(dist, 4) AS dist
         |FROM walks WHERE v = $t ORDER BY dist LIMIT $k""".stripMargin

    Oracle.assertEquivalent(got, sql, "edges" -> edges)
  }
}
