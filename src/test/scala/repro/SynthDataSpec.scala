package repro

import org.apache.spark.sql.functions._

/** Sanity over the provided TPC-H-lite generators (unused by the
  * answer-graph workload, but part of the shared substrate).
  */
class SynthDataSpec extends SparkSpec {

  test("lineitem scales and has the documented columns") {
    val li = SynthData.lineitem(spark, sf = 0.001)
    assert(li.columns.contains("l_orderkey") && li.columns.contains("l_shipdate"))
    assert(li.count() == 6000)
  }

  test("orders keys are dense from 1") {
    val o = SynthData.orders(spark, sf = 0.001)
    assert(o.agg(min("o_orderkey")).head.getLong(0) == 1)
    assert(o.count() == 1500)
  }

  test("customer and part respect scale") {
    assert(SynthData.customer(spark, sf = 0.001).count() == 150)
    assert(SynthData.part(spark, sf = 0.001).count() == 200)
  }

  test("zipf keys are skewed; uniform keys are not") {
    val z = SynthData.zipfKeys(spark, rows = 20000, nKeys = 1000)
    val u = SynthData.uniformKeys(spark, rows = 20000, nKeys = 1000)
    val zTop = z.groupBy("k").count().agg(max("count")).head.getLong(0)
    val uTop = u.groupBy("k").count().agg(max("count")).head.getLong(0)
    assert(zTop > 3 * uTop, s"zipf top=$zTop uniform top=$uTop")
  }
}
