package repro

import org.apache.spark.sql.functions._

/** Smoke tests for the provided TPC-H-lite generators and the DuckDB
  * oracle plumbing (deterministic data, SQL equivalence end to end).
  */
class SynthDataSpec extends SparkSpec {

  test("generators are deterministic in (sf, seed)") {
    val a = SynthData.customer(spark, sf = 0.001).collect().toSeq
    val b = SynthData.customer(spark, sf = 0.001).collect().toSeq
    assert(a == b)
  }

  test("row counts scale with sf") {
    assert(SynthData.orders(spark, 0.001).count() == 1500)
    assert(SynthData.customer(spark, 0.001).count() == 150)
  }

  test("aggregate over orders matches DuckDB") {
    val orders = SynthData.orders(spark, 0.001)
    val got = orders.groupBy("o_orderstatus")
      .agg(count(lit(1)).as("n"), round(sum("o_totalprice"), 2).as("total"))
    Oracle.assertEquivalent(
      got.select(col("o_orderstatus"), col("n"), col("total")),
      """SELECT o_orderstatus, count(*) AS n,
        |       round(sum(CAST(o_totalprice AS DOUBLE)), 2) AS total
        |FROM orders GROUP BY o_orderstatus""".stripMargin,
      "orders" -> orders)
  }

  test("join customer-orders matches DuckDB") {
    val orders = SynthData.orders(spark, 0.001)
    val customer = SynthData.customer(spark, 0.001)
    val got = orders.join(customer, orders("o_custkey") === customer("c_custkey"))
      .groupBy("c_mktsegment").agg(count(lit(1)).as("n"))
    Oracle.assertEquivalent(got.select(col("c_mktsegment"), col("n")),
      """SELECT c_mktsegment, count(*) AS n
        |FROM orders JOIN customer ON o_custkey = c_custkey
        |GROUP BY c_mktsegment""".stripMargin,
      "orders" -> orders, "customer" -> customer)
  }

  test("zipf keys are skewed, uniform keys are not") {
    val z = SynthData.zipfKeys(spark, rows = 5000, nKeys = 100)
    val u = SynthData.uniformKeys(spark, rows = 5000, nKeys = 100)
    val zTop = z.groupBy("k").count().agg(max("count")).head().getLong(0)
    val uTop = u.groupBy("k").count().agg(max("count")).head().getLong(0)
    assert(zTop > uTop * 3, s"zipf top=$zTop uniform top=$uTop")
  }
}
