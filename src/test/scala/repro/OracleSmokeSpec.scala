package repro

import org.apache.spark.sql.functions._

/** Smoke tests for the provided TPC-H-lite generators and the DuckDB
  * oracle plumbing (the graph workloads carry the real correctness load;
  * this keeps the provided harness exercised end to end).
  */
class OracleSmokeSpec extends SparkSpec {

  test("lineitem aggregate matches DuckDB") {
    val li = SynthData.lineitem(spark, sf = 0.001).limit(2000).cache()
    val sparkRes = li
      .groupBy(col("l_returnflag"))
      .agg(count("*").as("cnt"), round(sum(col("l_quantity")), 2).as("qty"))
    val sql =
      """SELECT l_returnflag,
        |       COUNT(*) AS cnt,
        |       ROUND(SUM(CAST(l_quantity AS DOUBLE)), 2) AS qty
        |FROM lineitem GROUP BY l_returnflag""".stripMargin
    Oracle.assertEquivalent(sparkRes, sql, "lineitem" -> li)
  }

  test("orders-customer join matches DuckDB") {
    val o = SynthData.orders(spark, sf = 0.001).limit(1000).cache()
    val c = SynthData.customer(spark, sf = 0.001).cache()
    val sparkRes = o
      .join(c, col("o_custkey") === col("c_custkey"))
      .groupBy(col("c_mktsegment"))
      .agg(count("*").as("cnt"))
    val sql =
      """SELECT c_mktsegment, COUNT(*) AS cnt
        |FROM orders JOIN customer ON o_custkey = c_custkey
        |GROUP BY c_mktsegment""".stripMargin
    Oracle.assertEquivalent(sparkRes, sql, "orders" -> o, "customer" -> c)
  }

  test("generators are deterministic in (sf, seed)") {
    val a = SynthData.part(spark, sf = 0.001).agg(sum("p_size")).collect()(0).getLong(0)
    val b = SynthData.part(spark, sf = 0.001).agg(sum("p_size")).collect()(0).getLong(0)
    assert(a == b)
  }
}
