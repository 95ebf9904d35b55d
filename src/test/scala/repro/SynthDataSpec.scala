package repro

import org.apache.spark.sql.functions._

/** Smoke tests for the provided TPC-H-lite generators: determinism, scale,
  * and a DuckDB-oracled aggregation over the generated data (confirms the
  * Oracle plumbing end-to-end on the stock schema).
  */
class SynthDataSpec extends SparkSpec {

  test("lineitem is deterministic in (sf, seed)") {
    val a = SynthData.lineitem(spark, sf = 0.001, seed = 1).agg(sum("l_quantity")).head().getDouble(0)
    val b = SynthData.lineitem(spark, sf = 0.001, seed = 1).agg(sum("l_quantity")).head().getDouble(0)
    assert(a == b)
  }

  test("row counts scale with sf") {
    assert(SynthData.orders(spark, sf = 0.002).count() == 3000L)
    assert(SynthData.customer(spark, sf = 0.002).count() == 300L)
  }

  test("zipf keys are skewed, uniform keys are not") {
    val z = SynthData.zipfKeys(spark, 20000, 1000).groupBy("k").count()
      .orderBy(desc("count")).limit(1).head().getLong(1)
    val u = SynthData.uniformKeys(spark, 20000, 1000).groupBy("k").count()
      .orderBy(desc("count")).limit(1).head().getLong(1)
    assert(z > 3 * u, s"zipf top $z vs uniform top $u")
  }

  test("oracle: grouped aggregation over orders matches DuckDB") {
    val orders = SynthData.orders(spark, sf = 0.002)
    val result = orders
      .groupBy("o_orderstatus")
      .agg(count(lit(1)).as("cnt"), round(sum("o_totalprice"), 0).as("total"))
    Oracle.assertEquivalent(
      result,
      """SELECT o_orderstatus, COUNT(*) AS cnt,
        |       ROUND(SUM(CAST(o_totalprice AS DOUBLE)), 0) AS total
        |FROM orders GROUP BY o_orderstatus""".stripMargin,
      "orders" -> orders)
  }
}
