package repro

import org.apache.spark.sql.functions._

/** Sanity checks of the provided TPC-H-lite generators plus oracle round
  * trips — kept because road networks reuse the same SF conventions.
  */
class SynthDataSpec extends SparkSpec {

  test("lineitem row count scales with sf") {
    assert(SynthData.lineitem(spark, 0.001).count() == 6000L)
  }

  test("lineitem keys stay within the orders domain") {
    val li = SynthData.lineitem(spark, 0.001)
    val mx = li.agg(max("l_orderkey")).head.getLong(0)
    assert(mx <= 1500L + 1)
  }

  test("orders are unique by key") {
    val o = SynthData.orders(spark, 0.001)
    assert(o.count() == o.select("o_orderkey").distinct().count())
  }

  test("zipf keys are skewed: top key far exceeds uniform share") {
    val z = SynthData.zipfKeys(spark, rows = 20000, nKeys = 1000)
    val top = z.groupBy("k").count().orderBy(desc("count")).head.getLong(1)
    assert(top > 20000 / 1000 * 5, s"top=$top")
  }

  test("uniform keys are roughly balanced") {
    val u = SynthData.uniformKeys(spark, rows = 20000, nKeys = 10)
    val counts = u.groupBy("k").count().collect().map(_.getLong(1))
    assert(counts.max < counts.min * 2)
  }

  test("oracle: lineitem aggregate matches DuckDB") {
    val li = SynthData.lineitem(spark, 0.001).select("l_returnflag", "l_quantity")
    Oracle.assertEquivalent(
      li.groupBy("l_returnflag").agg(
        count(lit(1)).as("n"),
        round(sum("l_quantity"), 2).as("sum_qty")),
      """SELECT l_returnflag, count(*) AS n, round(sum(CAST(l_quantity AS DOUBLE)), 2) AS sum_qty
        |FROM lineitem GROUP BY l_returnflag""".stripMargin,
      "lineitem" -> li)
  }

  test("oracle: orders/customer join cardinality matches DuckDB") {
    val o = SynthData.orders(spark, 0.001).select("o_orderkey", "o_custkey")
    val c = SynthData.customer(spark, 0.001).select("c_custkey", "c_mktsegment")
    val joined = o.join(c, o("o_custkey") === c("c_custkey"))
      .groupBy("c_mktsegment").agg(count(lit(1)).as("n"))
    Oracle.assertEquivalent(
      joined,
      """SELECT c_mktsegment, count(*) AS n
        |FROM orders o JOIN customer c ON CAST(o.o_custkey AS BIGINT) = CAST(c.c_custkey AS BIGINT)
        |GROUP BY c_mktsegment""".stripMargin,
      "orders" -> o, "customer" -> c)
  }

  test("generators are deterministic in (sf, seed)") {
    val a = SynthData.part(spark, 0.001).collect().map(_.toString).sorted
    val b = SynthData.part(spark, 0.001).collect().map(_.toString).sorted
    assert(a.sameElements(b))
  }
}
