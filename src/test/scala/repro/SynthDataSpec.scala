package repro

import org.apache.spark.sql.functions._

/** Sanity coverage for the provided TPC-H-lite generators and the DuckDB
  * oracle wiring (the Raven experiments use the paper-specific generators in
  * `repro.data.Datasets`, which follow the same conventions).
  */
class SynthDataSpec extends SparkSpec {

  test("lineitem generator is deterministic and correctly sized at SF=0.001") {
    val a = SynthData.lineitem(spark, sf = 0.001)
    assert(a.count() == 6000)
    val b = SynthData.lineitem(spark, sf = 0.001)
    assert(a.agg(sum("l_extendedprice")).collect()(0).getDouble(0) ==
      b.agg(sum("l_extendedprice")).collect()(0).getDouble(0))
  }

  test("orders/customer keys stay within FK ranges") {
    val o = SynthData.orders(spark, sf = 0.001)
    val c = SynthData.customer(spark, sf = 0.001)
    val nCust = c.count()
    val bad = o.filter(col("o_custkey") < 1 || col("o_custkey") > nCust).count()
    assert(bad == 0)
  }

  test("zipf keys are skewed; uniform keys are not") {
    val z = SynthData.zipfKeys(spark, rows = 20000, nKeys = 1000)
    val u = SynthData.uniformKeys(spark, rows = 20000, nKeys = 1000)
    def topShare(df: org.apache.spark.sql.DataFrame): Double =
      df.groupBy("k").count().orderBy(desc("count")).limit(1)
        .collect()(0).getLong(1).toDouble / 20000
    assert(topShare(z) > 5 * topShare(u))
  }

  test("oracle agrees with Spark on a TPC-H-lite aggregation") {
    // project to the aggregation inputs (the oracle ships rows as strings)
    val li = SynthData.lineitem(spark, sf = 0.001).select("l_returnflag", "l_quantity")
    val sparkOut = li.groupBy("l_returnflag")
      .agg(count(lit(1)).as("cnt"), round(sum("l_quantity"), 2).as("qty"))
    Oracle.assertEquivalent(
      sparkOut,
      """SELECT l_returnflag,
                COUNT(*) AS cnt,
                ROUND(SUM(CAST(l_quantity AS DOUBLE)), 2) AS qty
         FROM lineitem GROUP BY l_returnflag""",
      "lineitem" -> li)
  }
}
