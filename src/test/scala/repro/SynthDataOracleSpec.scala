package repro

import org.apache.spark.sql.functions._

/** Sanity suite for the provided TPC-H-lite scaffold: exercises the DuckDB
  * oracle end-to-end on classic aggregation/join shapes so that a broken
  * oracle (or generator) surfaces independently of the graph pipeline.
  */
class SynthDataOracleSpec extends SparkSpec {

  private lazy val li = SynthData.lineitem(spark, sf = 0.002).cache()
  private lazy val ord = SynthData.orders(spark, sf = 0.002).cache()

  test("lineitem aggregation matches DuckDB") {
    val q = li.groupBy("l_returnflag")
      .agg(count(lit(1)).as("cnt"), round(sum("l_quantity"), 4).as("qty"))
    Oracle.assertEquivalent(q,
      """SELECT l_returnflag, COUNT(*) AS cnt,
        |       ROUND(SUM(CAST(l_quantity AS DOUBLE)), 4) AS qty
        |FROM lineitem GROUP BY l_returnflag""".stripMargin,
      "lineitem" -> li)
  }

  test("lineitem-orders join matches DuckDB") {
    val q = li.join(ord, li("l_orderkey") === ord("o_orderkey"))
      .groupBy("o_orderstatus").agg(count(lit(1)).as("cnt"))
    Oracle.assertEquivalent(q,
      """SELECT o_orderstatus, COUNT(*) AS cnt
        |FROM lineitem JOIN orders ON l_orderkey = o_orderkey
        |GROUP BY o_orderstatus""".stripMargin,
      "lineitem" -> li, "orders" -> ord)
  }

  test("generators are deterministic in (sf, seed)") {
    val a = SynthData.orders(spark, sf = 0.001).agg(sum("o_custkey")).collect()(0).getLong(0)
    val b = SynthData.orders(spark, sf = 0.001).agg(sum("o_custkey")).collect()(0).getLong(0)
    assert(a == b)
  }
}
