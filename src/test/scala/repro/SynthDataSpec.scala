package repro

import org.apache.spark.sql.functions._

/** Sanity coverage for the provided TPC-H-lite generators plus an
  * Oracle-checked join — keeps the shared scaffold exercised even though
  * the paper's workloads use the repro.data generators.
  */
class SynthDataSpec extends SparkSpec {

  private val sf = 0.002

  test("lineitem: schema and ranges") {
    val li = SynthData.lineitem(spark, sf)
    assert(li.columns.contains("l_orderkey") && li.columns.contains("l_shipdate"))
    val row = li.agg(min("l_quantity"), max("l_quantity"), min("l_discount"),
      max("l_discount")).collect()(0)
    assert(row.getDouble(0) >= 1.0 && row.getDouble(1) <= 51.0)
    assert(row.getDouble(2) >= 0.0 && row.getDouble(3) <= 0.10 + 1e-9)
  }

  test("generators are deterministic in (sf, seed)") {
    val a = SynthData.orders(spark, sf).agg(sum("o_totalprice")).collect()(0).getDouble(0)
    val b = SynthData.orders(spark, sf).agg(sum("o_totalprice")).collect()(0).getDouble(0)
    assert(a == b)
  }

  test("orders/customer/part row counts scale with sf") {
    assert(SynthData.orders(spark, sf).count() == (1500000 * sf).toLong)
    assert(SynthData.customer(spark, sf).count() == (150000 * sf).toLong)
    assert(SynthData.part(spark, sf).count() == (200000 * sf).toLong)
  }

  test("zipf keys are skewed, uniform keys are not") {
    val z = SynthData.zipfKeys(spark, 20000, 1000)
    val u = SynthData.uniformKeys(spark, 20000, 1000)
    def topShare(df: org.apache.spark.sql.DataFrame): Double =
      df.groupBy("k").count().orderBy(desc("count")).limit(1)
        .collect()(0).getLong(1).toDouble / 20000
    assert(topShare(z) > 5 * topShare(u))
  }

  test("oracle: grouped aggregate over orders matches DuckDB") {
    val o = SynthData.orders(spark, sf).select("o_orderstatus", "o_totalprice")
    val got = o.groupBy("o_orderstatus")
      .agg(count(lit(1)).as("c"), round(sum("o_totalprice"), 2).as("s"))
    Oracle.assertEquivalent(got,
      """SELECT o_orderstatus, COUNT(*) AS c,
        |       ROUND(SUM(CAST(o_totalprice AS DOUBLE)), 2) AS s
        |FROM orders GROUP BY o_orderstatus""".stripMargin,
      "orders" -> o)
  }

  test("oracle: customer-orders join matches DuckDB") {
    val o = SynthData.orders(spark, sf).select("o_orderkey", "o_custkey")
    val c = SynthData.customer(spark, sf).select("c_custkey", "c_mktsegment")
    val got = o.join(c, o("o_custkey") === c("c_custkey"))
      .groupBy("c_mktsegment").agg(count(lit(1)).as("n"))
    Oracle.assertEquivalent(got,
      """SELECT c_mktsegment, COUNT(*) AS n
        |FROM orders JOIN customer ON o_custkey = c_custkey
        |GROUP BY c_mktsegment""".stripMargin,
      "orders" -> o, "customer" -> c)
  }
}
