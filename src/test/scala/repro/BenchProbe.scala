package repro

import repro.harness.Table1Harness

/** Dev probe: run the Table-1 harness at a given scale factor.
  * Run: sbt "Test/runMain repro.BenchProbe 0.1 2"
  */
object BenchProbe {
  def main(args: Array[String]): Unit = {
    val spark = SparkSpec.shared
    val sf   = args.lift(0).map(_.toDouble).getOrElse(0.1)
    val reps = args.lift(1).map(_.toInt).getOrElse(2)
    val rows = Table1Harness.run(spark, sf, reps, "target/bench-data")
    println(Table1Harness.render(rows))
    spark.stop()
  }
}
