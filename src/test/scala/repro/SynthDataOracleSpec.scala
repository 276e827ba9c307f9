package repro

import org.apache.spark.sql.functions._

/** Smoke tests for the provided TPC-H-lite generators against the DuckDB
  * oracle — exercises the Oracle plumbing end-to-end on relational queries
  * (the graph algorithms have their own exact-reference oracles).
  */
class SynthDataOracleSpec extends SparkSpec {

  private lazy val li = SynthData.lineitem(spark, sf = 0.001).cache()
  private lazy val od = SynthData.orders(spark, sf = 0.001).cache()
  private lazy val cu = SynthData.customer(spark, sf = 0.001).cache()

  test("Q1-lite aggregate matches DuckDB") {
    val q = li.groupBy("l_returnflag")
      .agg(
        round(sum(col("l_quantity")), 4).as("sum_qty"),
        count(lit(1)).cast("long").as("cnt"),
      )
      .select(col("l_returnflag"), col("sum_qty"), col("cnt").cast("double").as("cnt"))
    Oracle.assertEquivalent(
      q,
      """SELECT l_returnflag,
                ROUND(SUM(CAST(l_quantity AS DOUBLE)), 4) AS sum_qty,
                CAST(COUNT(*) AS DOUBLE) AS cnt
         FROM lineitem GROUP BY l_returnflag""",
      "lineitem" -> li)
  }

  test("orders-customer join matches DuckDB") {
    val q = od.join(cu, od("o_custkey") === cu("c_custkey"))
      .groupBy("c_mktsegment")
      .agg(count(lit(1)).cast("double").as("orders"))
    Oracle.assertEquivalent(
      q,
      """SELECT c_mktsegment, CAST(COUNT(*) AS DOUBLE) AS orders
         FROM orders o JOIN customer c ON CAST(o.o_custkey AS BIGINT) = CAST(c.c_custkey AS BIGINT)
         GROUP BY c_mktsegment""",
      "orders" -> od, "customer" -> cu)
  }

  test("zipf keys are skewed, uniform keys are not") {
    val z = SynthData.zipfKeys(spark, 20000, 1000, alpha = 1.2)
    val u = SynthData.uniformKeys(spark, 20000, 1000)
    val zTop = z.groupBy("k").count().agg(max("count")).collect()(0).getLong(0)
    val uTop = u.groupBy("k").count().agg(max("count")).collect()(0).getLong(0)
    assert(zTop > 4 * uTop, s"zipf top $zTop vs uniform top $uTop")
  }
}
