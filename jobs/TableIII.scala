package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.bench.Harness
import repro.graph.GraphGen

/** spark-submit entrypoint for Table III (Exp-1).
  *
  * Usage: spark-submit --class repro.jobs.TableIII <jar> [b] [trials]
  */
object TableIII {
  def main(args: Array[String]): Unit = {
    val b = args.lift(0).map(_.toInt).getOrElse(10)
    val trials = args.lift(1).map(_.toInt).getOrElse(50)
    val spark = SparkSession.builder.appName("atr-table3")
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .getOrCreate()
    try Harness.printIII(Harness.tableIII(spark, GraphGen.presets.map(_.name), b, trials), b)
    finally spark.stop()
  }
}
