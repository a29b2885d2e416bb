package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.harness.Table1Harness

/** spark-submit entrypoint reproducing the paper's Table 1.
  *
  * Usage: spark-submit --class repro.jobs.Table1Job <jar> [sf] [reps] [dataDir]
  *   sf      scale factor for the YagoLite dataset (default 0.1)
  *   reps    timed repetitions per measurement, first dropped (default 3)
  *   dataDir directory for the Parquet dataset (default /tmp/repro-data)
  */
object Table1Job {
  def main(args: Array[String]): Unit = {
    val sf      = args.lift(0).map(_.toDouble).getOrElse(0.1)
    val reps    = args.lift(1).map(_.toInt).getOrElse(3)
    val dataDir = args.lift(2).getOrElse("/tmp/repro-data")
    val spark = SparkSession.builder
      .appName("repro-table1")
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
    try {
      val rows = Table1Harness.run(spark, sf, reps, dataDir)
      println(Table1Harness.render(rows))
    } finally spark.stop()
  }
}
