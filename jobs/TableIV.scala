package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.bench.Harness
import repro.graph.GraphGen

/** spark-submit entrypoint for Table IV (Exp-7, upward-route sizes).
  *
  * Usage: spark-submit --class repro.jobs.TableIV <jar>
  */
object TableIV {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder.appName("atr-table4")
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .getOrCreate()
    try Harness.printIV(Harness.tableIV(spark, GraphGen.presets.map(_.name)))
    finally spark.stop()
  }
}
