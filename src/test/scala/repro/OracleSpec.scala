package repro

import org.apache.spark.sql.functions._

/** The oracle must actually catch wrong results — a checker that cannot
  * fail is no checker. These are deliberate-mismatch tests.
  */
class OracleSpec extends SparkSpec {

  test("oracle accepts an identical query") {
    import spark.implicits._
    val df = Seq((1, "a"), (2, "b")).toDF("k", "v")
    Oracle.assertEquivalent(
      df.select(col("k").cast("string").as("k"), col("v")),
      "SELECT k, v FROM t", "t" -> df)
  }

  test("oracle rejects a wrong row value") {
    import spark.implicits._
    val df = Seq((1, "a"), (2, "b")).toDF("k", "v")
    val wrong = Seq((1, "a"), (2, "WRONG")).toDF("k", "v")
    val ex = intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(
        wrong.select(col("k").cast("string").as("k"), col("v")),
        "SELECT k, v FROM t", "t" -> df)
    }
    assert(ex.getMessage.contains("result mismatch"))
  }

  test("oracle rejects missing rows") {
    import spark.implicits._
    val df = Seq((1, "a"), (2, "b")).toDF("k", "v")
    val short = Seq((1, "a")).toDF("k", "v")
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(
        short.select(col("k").cast("string").as("k"), col("v")),
        "SELECT k, v FROM t", "t" -> df)
    }
  }

  test("oracle rejects mismatched column sets") {
    import spark.implicits._
    val df = Seq((1, "a")).toDF("k", "v")
    val ex = intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(
        df.select(col("k").cast("string").as("wrongname"), col("v")),
        "SELECT k, v FROM t", "t" -> df)
    }
    assert(ex.getMessage.contains("column mismatch"))
  }
}
