package repro

import org.apache.spark.sql.functions._

/** Plumbing check for the DuckDB oracle over the TPC-H-lite generators. */
class OracleSmokeSpec extends SparkSpec {

  test("aggregate over lineitem matches DuckDB") {
    val li = SynthData.lineitem(spark, sf = 0.0005).cache()
    val agg = li
      .groupBy("l_returnflag")
      .agg(count(lit(1)) as "cnt", round(sum("l_quantity"), 2) as "qty")
    Oracle.assertEquivalent(
      agg,
      """SELECT l_returnflag, COUNT(*) AS cnt,
        |       ROUND(SUM(CAST(l_quantity AS DOUBLE)), 2) AS qty
        |FROM lineitem GROUP BY l_returnflag""".stripMargin,
      "lineitem" -> li,
    )
  }

  test("join of orders and customer matches DuckDB") {
    val o = SynthData.orders(spark, sf = 0.002).cache()
    val c = SynthData.customer(spark, sf = 0.002).cache()
    val j = o.join(c, o("o_custkey") === c("c_custkey"))
      .groupBy("c_mktsegment")
      .agg(count(lit(1)) as "cnt")
    Oracle.assertEquivalent(
      j,
      """SELECT c_mktsegment, COUNT(*) AS cnt
        |FROM orders o JOIN customer c ON o.o_custkey = c.c_custkey
        |GROUP BY c_mktsegment""".stripMargin,
      "orders"   -> o,
      "customer" -> c,
    )
  }
}
