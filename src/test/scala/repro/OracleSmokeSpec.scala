package repro

import org.apache.spark.sql.functions._

/** Smoke test of the provided substrate: SynthData generators are
  * deterministic and the DuckDB oracle path works end-to-end on a relational
  * aggregate (integer-exact columns, so no float formatting hazards).
  */
class OracleSmokeSpec extends SparkSpec {

  test("SynthData.lineitem is deterministic in (sf, seed)") {
    val a = SynthData.lineitem(spark, sf = 0.001).agg(sum("l_orderkey")).head.getLong(0)
    val b = SynthData.lineitem(spark, sf = 0.001).agg(sum("l_orderkey")).head.getLong(0)
    assert(a == b)
  }

  test("DuckDB oracle validates a grouped aggregate over lineitem") {
    val li = SynthData.lineitem(spark, sf = 0.001)
    val df = li.groupBy("l_returnflag")
      .agg(count(lit(1)).as("cnt"), sum("l_linenumber").as("sum_ln"))
    Oracle.assertEquivalent(
      df,
      """SELECT l_returnflag,
        |       COUNT(*) AS cnt,
        |       SUM(CAST(l_linenumber AS INT)) AS sum_ln
        |FROM lineitem GROUP BY l_returnflag""".stripMargin,
      "lineitem" -> li)
  }

  test("DuckDB oracle validates a join between orders and customer") {
    val o = SynthData.orders(spark, sf = 0.001)
    val c = SynthData.customer(spark, sf = 0.001)
    val df = o.join(c, o("o_custkey") === c("c_custkey"))
      .groupBy("c_mktsegment").agg(count(lit(1)).as("cnt"))
    Oracle.assertEquivalent(
      df,
      """SELECT c_mktsegment, COUNT(*) AS cnt
        |FROM orders JOIN customer ON CAST(o_custkey AS BIGINT) = CAST(c_custkey AS BIGINT)
        |GROUP BY c_mktsegment""".stripMargin,
      "orders" -> o, "customer" -> c)
  }
}
