package repro

import org.apache.spark.sql.functions._

/** Smoke coverage for the provided TPC-H-lite generators and the DuckDB
  * oracle plumbing itself.
  */
class SynthDataSmokeSpec extends SparkSpec {

  test("lineitem generates deterministic row counts per scale factor") {
    assert(SynthData.lineitem(spark, sf = 0.001).count() == 6000)
    assert(SynthData.customer(spark, sf = 0.001).count() == 150)
  }
  test("customer aggregate matches DuckDB") {
    val cust = SynthData.customer(spark, sf = 0.001).cache()
    val sparkSide = cust.groupBy("c_mktsegment").agg(count(lit(1)).as("n"))
    Oracle.assertEquivalent(
      sparkSide,
      "SELECT c_mktsegment, COUNT(*) AS n FROM customer GROUP BY c_mktsegment",
      "customer" -> cust)
  }
  test("orders keys are dense from 1..N") {
    val o = SynthData.orders(spark, sf = 0.001)
    val mm = o.agg(min("o_orderkey"), max("o_orderkey"), count(lit(1))).collect().head
    assert(mm.getLong(0) == 1L && mm.getLong(1) == mm.getLong(2))
  }
  test("zipf keys are skewed relative to uniform keys") {
    val z = SynthData.zipfKeys(spark, 20000, 1000)
    val u = SynthData.uniformKeys(spark, 20000, 1000)
    def topShare(df: org.apache.spark.sql.DataFrame): Double =
      df.groupBy("k").count().orderBy(desc("count")).limit(10)
        .agg(sum("count")).collect().head.getLong(0).toDouble / 20000
    assert(topShare(z) > topShare(u) * 2)
  }
}
