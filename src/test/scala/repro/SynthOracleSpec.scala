package repro

import org.apache.spark.sql.functions._

/** Sanity checks wiring the provided TPC-H-lite generators through the
  * DuckDB oracle — validates the harness itself (the ED evaluation data
  * lives in repro.data).
  */
class SynthOracleSpec extends SparkSpec {

  test("lineitem aggregate matches DuckDB") {
    val li = SynthData.lineitem(spark, sf = 0.002).cache()
    val agg = li.groupBy("l_returnflag")
      .agg(count(lit(1)).as("n"), round(sum("l_quantity"), 2).as("qty"))
    Oracle.assertEquivalent(agg,
      """SELECT l_returnflag, count(1) AS n,
        |       round(sum(CAST(l_quantity AS DOUBLE)), 2) AS qty
        |FROM lineitem GROUP BY l_returnflag""".stripMargin,
      "lineitem" -> li)
  }

  test("orders-customer join count matches DuckDB") {
    val o = SynthData.orders(spark, sf = 0.002)
    val c = SynthData.customer(spark, sf = 0.002)
    val j = o.join(c, o("o_custkey") === c("c_custkey"))
      .groupBy("c_mktsegment").agg(count(lit(1)).as("n"))
    Oracle.assertEquivalent(j,
      """SELECT c_mktsegment, count(1) AS n
        |FROM orders JOIN customer ON CAST(o_custkey AS BIGINT) = CAST(c_custkey AS BIGINT)
        |GROUP BY c_mktsegment""".stripMargin,
      "orders" -> o, "customer" -> c)
  }

  test("zipf keys are skewed, uniform keys are not") {
    val z = SynthData.zipfKeys(spark, 20000, 1000)
    val u = SynthData.uniformKeys(spark, 20000, 1000)
    val topZ = z.groupBy("k").count().orderBy(desc("count")).limit(1)
      .collect()(0).getLong(1)
    val topU = u.groupBy("k").count().orderBy(desc("count")).limit(1)
      .collect()(0).getLong(1)
    assert(topZ > 3 * topU, s"zipf top=$topZ uniform top=$topU")
  }
}
