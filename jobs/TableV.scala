package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.bench.Harness
import repro.graph.GraphGen

/** spark-submit entrypoint for Table V (Exp-9, AKT vs GAS).
  *
  * Usage: spark-submit --class repro.jobs.TableV <jar> [b]
  */
object TableV {
  def main(args: Array[String]): Unit = {
    val b = args.lift(0).map(_.toInt).getOrElse(10)
    val spark = SparkSession.builder.appName("atr-table5")
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .getOrCreate()
    try Harness.printV(Harness.tableV(spark, GraphGen.presets.map(_.name), b), b)
    finally spark.stop()
  }
}
