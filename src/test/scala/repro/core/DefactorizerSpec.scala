package repro.core

import repro.SparkSpec
import repro.workload.YagoQueries

/** Phase-2: greedy join-order properties and embedding correctness
  * against the direct-join baseline.
  */
class DefactorizerSpec extends SparkSpec {

  private def agFor(cq: ConjunctiveQuery, ts: repro.rdf.TripleStore): AnswerGraph = {
    val cat = Catalog.build(ts.triples)
    val chords = Triangulator.chords(cq, cat)
    AnswerGraphBuilder.build(ts, cq, Edgifier.plan(cq, cat), chords)
  }

  test("join order starts from the smallest AG edge") {
    val ag = agFor(Fixtures.chainCq, Fixtures.chainData(spark))
    // Chain AG sizes: A->3, B->1, C->2.
    assert(Defactorizer.joinOrder(ag).head.id == 1)
  }

  test("join order is connected at every prefix") {
    for (cq <- Seq(Fixtures.chainCq, Fixtures.diamondCq)) {
      val ts = if (cq.isCyclic) Fixtures.diamondData(spark) else Fixtures.chainData(spark)
      val order = Defactorizer.joinOrder(agFor(cq, ts))
      for (k <- 1 to order.size)
        assert(cq.isConnected(order.take(k).map(_.id).toSet), s"${cq.name} prefix $k")
    }
  }

  test("chain embeddings from the AG match the designed answer set") {
    val ag = agFor(Fixtures.chainCq, Fixtures.chainData(spark))
    val rows = Defactorizer.embeddings(ag).collect()
      .map(r => (r.getLong(0), r.getLong(1), r.getLong(2), r.getLong(3))).toSet
    assert(rows == Set(
      (1L, 10L, 20L, 31L), (2L, 10L, 20L, 31L), (3L, 10L, 20L, 31L),
      (1L, 10L, 20L, 33L), (2L, 10L, 20L, 33L), (3L, 10L, 20L, 33L),
    ))
  }

  test("diamond embeddings are exact despite the non-ideal AG") {
    val ag = agFor(Fixtures.diamondCq, Fixtures.diamondData(spark))
    val rows = Defactorizer.embeddings(ag).collect()
      .map(r => (r.getLong(0), r.getLong(1), r.getLong(2), r.getLong(3))).toSet
    assert(rows == Fixtures.diamondEmbeddings)
  }

  test("embedding columns are the query variables in order") {
    val ag = agFor(Fixtures.diamondCq, Fixtures.diamondData(spark))
    assert(Defactorizer.embeddings(ag).columns.toSeq == Seq("a", "b", "c", "d"))
  }

  test("workload queries: defactorized count equals baseline count") {
    val ts = Fixtures.yago(spark, 0.01)
    for (cq <- Seq(YagoQueries.s1, YagoQueries.d6, YagoQueries.d10)) {
      val wf = Defactorizer.embeddings(agFor(cq, ts)).count()
      val base = Baseline.dataFrame(ts, cq).count()
      assert(wf == base, s"${cq.name}: wf=$wf baseline=$base")
    }
  }
}
