package repro

import org.apache.spark.sql.functions._

/** Wiring check for the provided DuckDB oracle over the provided TPC-H-lite
  * generators (the CS-AG paper itself is graph-shaped; the graph-side oracle
  * checks live in the per-module suites).
  */
class OracleSmokeSpec extends SparkSpec {

  test("oracle: lineitem aggregate matches DuckDB") {
    val li = SynthData.lineitem(spark, sf = 0.001, seed = 0)
    val sparkDf = li.groupBy("l_returnflag")
      .agg(count(lit(1)).as("cnt"), round(sum("l_quantity"), 2).as("qty"))
    val sql =
      """SELECT l_returnflag,
        |       COUNT(*) AS cnt,
        |       ROUND(SUM(CAST(l_quantity AS DOUBLE)), 2) AS qty
        |FROM lineitem GROUP BY l_returnflag""".stripMargin
    Oracle.assertEquivalent(sparkDf, sql, "lineitem" -> li)
  }

  test("oracle: orders/customer join matches DuckDB") {
    val o = SynthData.orders(spark, sf = 0.001)
    val c = SynthData.customer(spark, sf = 0.001)
    val sparkDf = o.join(c, o("o_custkey") === c("c_custkey"))
      .groupBy("c_mktsegment").agg(count(lit(1)).as("cnt"))
    val sql =
      """SELECT c_mktsegment, COUNT(*) AS cnt
        |FROM orders JOIN customer ON o_custkey = c_custkey
        |GROUP BY c_mktsegment""".stripMargin
    Oracle.assertEquivalent(sparkDf, sql, "orders" -> o, "customer" -> c)
  }
}
