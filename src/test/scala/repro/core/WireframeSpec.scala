package repro.core

import repro.{Oracle, SparkSpec}
import repro.workload.YagoQueries

/** End-to-end WIREFRAME: the full two-phase evaluation against the
  * DuckDB oracle and the baseline over the whole Table-1 workload.
  */
class WireframeSpec extends SparkSpec {

  test("chain fixture end to end against the oracle") {
    val ts = Fixtures.chainData(spark)
    val run = Wireframe.run(ts, Fixtures.chainCq, Catalog.build(ts.triples))
    Oracle.assertEquivalent(run.embeddings, SqlGen.select(Fixtures.chainCq),
      "triples" -> ts.triples)
    assert(run.agSize == 6 && run.nEmbeddings == 6)
  }

  test("diamond fixture end to end against the oracle") {
    val ts = Fixtures.diamondData(spark)
    val run = Wireframe.run(ts, Fixtures.diamondCq, Catalog.build(ts.triples))
    Oracle.assertEquivalent(run.embeddings, SqlGen.select(Fixtures.diamondCq),
      "triples" -> ts.triples)
    assert(run.nEmbeddings == 2)
  }

  test("the full workload matches DuckDB exactly at oracle scale") {
    val ts = Fixtures.yago(spark, 0.003)
    val cat = Catalog.build(ts.triples)
    ts.createOrReplaceTempView("triples")
    for (cq <- YagoQueries.all) {
      val run = Wireframe.run(ts, cq, cat)
      Oracle.assertEquivalent(run.embeddings, SqlGen.select(cq), "triples" -> ts.triples)
    }
  }

  test("the full workload matches the baseline count at test scale") {
    val ts = Fixtures.yago(spark, 0.01)
    val cat = Fixtures.yagoCatalog(spark, 0.01)
    for (cq <- YagoQueries.all) {
      val run = Wireframe.run(ts, cq, cat)
      val base = Baseline.dataFrame(ts, cq).count()
      assert(run.nEmbeddings == base, s"${cq.name}: wf=${run.nEmbeddings} baseline=$base")
    }
  }

  test("workload queries are non-empty at test scale (as mined)") {
    val ts = Fixtures.yago(spark, 0.01)
    val cat = Fixtures.yagoCatalog(spark, 0.01)
    for (cq <- YagoQueries.all) {
      val run = Wireframe.run(ts, cq, cat)
      assert(run.nEmbeddings > 0, s"${cq.name} is empty at SF=0.01")
    }
  }

  test("snowflakes factorize: |AG| well below |embeddings| at test scale") {
    val ts = Fixtures.yago(spark, 0.01)
    val cat = Fixtures.yagoCatalog(spark, 0.01)
    for (cq <- YagoQueries.snowflakes) {
      val run = Wireframe.run(ts, cq, cat)
      assert(run.agSize < run.nEmbeddings,
        s"${cq.name}: |AG|=${run.agSize} !< |emb|=${run.nEmbeddings}")
    }
  }

  test("edge burnback never changes the embeddings, only the AG") {
    val ts = Fixtures.yago(spark, 0.003)
    val cat = Catalog.build(ts.triples)
    for (cq <- Seq(YagoQueries.d6, YagoQueries.d9)) {
      val without = Wireframe.run(ts, cq, cat)
      val withEb  = Wireframe.run(ts, cq, cat, edgeBurnback = true)
      assert(without.nEmbeddings == withEb.nEmbeddings, cq.name)
      assert(withEb.agSize <= without.agSize, cq.name)
    }
  }

  test("metrics are populated") {
    val ts = Fixtures.chainData(spark)
    val run = Wireframe.run(ts, Fixtures.chainCq, Catalog.build(ts.triples))
    assert(run.plan.order.size == 3)
    assert(run.chords.isEmpty)
    assert(run.phase1Ms >= 0 && run.phase2Ms >= 0 && run.totalMs >= run.phase2Ms)
  }
}
