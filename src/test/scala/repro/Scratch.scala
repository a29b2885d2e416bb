package repro

import org.apache.spark.sql.SparkSession
import repro.core.Baseline
import repro.rdf.{TripleStore, YagoLite}
import repro.workload.YagoQueries

/** Dev scratch: workload cardinalities at candidate scale factors.
  * Run: sbt "Test/runMain repro.Scratch <sf> [sf2 ...]"
  */
object Scratch {
  def main(args: Array[String]): Unit = {
    val spark = SparkSpec.shared
    val sfs = if (args.isEmpty) Seq(0.005) else args.map(_.toDouble).toSeq
    for (sf <- sfs) {
      val ts = TripleStore(YagoLite.triples(spark, sf).cache())
      println(f"=== sf=$sf triples=${ts.count()}")
      for (cq <- YagoQueries.all) {
        val t0 = System.nanoTime()
        val n = Baseline.dataFrame(ts, cq).count()
        println(f"${cq.name}%-4s baseline-count=$n%12d  in ${(System.nanoTime() - t0) / 1e9}%6.1f s")
      }
      ts.triples.unpersist()
    }
    spark.stop()
  }
}
