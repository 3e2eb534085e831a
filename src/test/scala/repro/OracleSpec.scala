package repro

import org.apache.spark.sql.functions._

/** Exercises the provided DuckDB oracle + TPC-H-lite generators, and the
  * determinism contract SynthData promises.
  */
class OracleSpec extends SparkSpec {

  test("orders: count by status matches DuckDB") {
    val o = SynthData.orders(spark, sf = 0.002).cache()
    val agg = o.groupBy("o_orderstatus").agg(count(lit(1)) as "cnt")
    Oracle.assertEquivalent(
      agg,
      "SELECT o_orderstatus, count(*) AS cnt FROM orders GROUP BY o_orderstatus",
      "orders" -> o
    )
  }

  test("customer: average balance per segment matches DuckDB") {
    val c = SynthData.customer(spark, sf = 0.01).cache()
    val agg = c.groupBy("c_mktsegment")
      .agg(round(avg(col("c_acctbal").cast("double")), 3) as "avg_bal")
    Oracle.assertEquivalent(
      agg,
      """SELECT c_mktsegment, round(avg(CAST(c_acctbal AS DOUBLE)), 3) AS avg_bal
        |FROM customer GROUP BY c_mktsegment""".stripMargin,
      "customer" -> c
    )
  }

  test("SynthData is deterministic in (sf, seed)") {
    val a = SynthData.lineitem(spark, sf = 0.001).collect()
    val b = SynthData.lineitem(spark, sf = 0.001).collect()
    assert(a.sameElements(b))
  }
}
