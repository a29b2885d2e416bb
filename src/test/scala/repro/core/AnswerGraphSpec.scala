package repro.core

import org.apache.spark.sql.DataFrame
import repro.SparkSpec
import repro.workload.YagoQueries

/** Phase-1 evaluator: edge extension, node burnback, chord maintenance,
  * edge burnback, and the iAG property on acyclic queries.
  */
class AnswerGraphSpec extends SparkSpec {

  private def pairs(df: DataFrame): Set[(Long, Long)] =
    df.collect().map(r => (r.getLong(0), r.getLong(1))).toSet

  private def buildChain(): AnswerGraph = {
    val ts = Fixtures.chainData(spark)
    val cq = Fixtures.chainCq
    val cat = Catalog.build(ts.triples)
    AnswerGraphBuilder.build(ts, cq, Edgifier.plan(cq, cat))
  }

  test("chain: node burnback removes the dangling A edge") {
    val ag = buildChain()
    assert(pairs(ag.edges(0).select("w", "x")) == Set((1L, 10L), (2L, 10L), (3L, 10L)))
  }

  test("chain: unreachable C edge removed") {
    val ag = buildChain()
    assert(pairs(ag.edges(2).select("y", "z")) == Set((20L, 31L), (20L, 33L)))
  }

  test("chain: iAG sizes match Fig.-1 expectation (6 of 8 data edges)") {
    val ag = buildChain()
    assert(ag.edgeSizes == Map(0 -> 3L, 1 -> 1L, 2 -> 2L))
    assert(ag.size == 6)
  }

  test("chain: node sets are exactly the embedded nodes") {
    val ag = buildChain()
    assert(ag.nodeSizes == Map("w" -> 3L, "x" -> 1L, "y" -> 1L, "z" -> 2L))
  }

  test("chain: AG columns are named by query variables") {
    val ag = buildChain()
    assert(ag.edges(0).columns.toSet == Set("w", "x"))
    assert(ag.edges(2).columns.toSet == Set("y", "z"))
  }

  test("plan must cover the query") {
    val ts = Fixtures.chainData(spark)
    val cq = Fixtures.chainCq
    val cat = Catalog.build(ts.triples)
    val partial = Plan(Edgifier.plan(cq, cat).steps.tail)
    intercept[IllegalArgumentException](AnswerGraphBuilder.build(ts, cq, partial))
  }

  private def buildDiamond(edgeBurnback: Boolean): AnswerGraph = {
    val ts = Fixtures.diamondData(spark)
    val cq = Fixtures.diamondCq
    val cat = Catalog.build(ts.triples)
    val chords = Triangulator.chords(cq, cat)
    AnswerGraphBuilder.build(ts, cq, Edgifier.plan(cq, cat), chords,
      edgeBurnback = edgeBurnback)
  }

  test("diamond without edge burnback: the Fig.-4 spurious edge survives") {
    val ag = buildDiamond(edgeBurnback = false)
    // Node burnback keeps P(1,6): nodes 1 and 6 are both live.
    assert(pairs(ag.edges(0).select("a", "b")) ==
      Set((1L, 2L), (5L, 6L), (1L, 6L)))
    assert(ag.size == 9) // all 9 data edges survive
  }

  test("diamond with edge burnback: the spurious edge is culled (iAG)") {
    val ag = buildDiamond(edgeBurnback = true)
    assert(pairs(ag.edges(0).select("a", "b")) == Set((1L, 2L), (5L, 6L)))
    assert(ag.size == 8)
  }

  test("diamond: chord holds only embedding-consistent pairs") {
    val ag = buildDiamond(edgeBurnback = false)
    val chord = ag.chords.values.head
    val cols = chord.columns.toSet
    // Either chord (a,d) or (b,c); both have exactly the two clean pairs.
    val expected =
      if (cols == Set("a", "d")) Set((1L, 4L), (5L, 8L))
      else Set((2L, 3L), (6L, 7L))
    assert(pairs(chord.select(cols.toSeq.sorted.head, cols.toSeq.sorted.last)) == expected)
  }

  test("diamond: fixpoint converges within the round cap") {
    val ag = buildDiamond(edgeBurnback = false)
    assert(ag.rounds < 10)
  }

  test("acyclic workload queries: every AG edge joins some embedding (iAG)") {
    val ts = Fixtures.yago(spark, 0.01)
    val cat = Fixtures.yagoCatalog(spark, 0.01)
    for (cq <- Seq(YagoQueries.s2, YagoQueries.s5)) {
      val ag = AnswerGraphBuilder.build(ts, cq, Edgifier.plan(cq, cat))
      val emb = Defactorizer.embeddings(ag).cache()
      try {
        for (e <- cq.edges) {
          val unused = ag.edges(e.id)
            .except(emb.select(e.src, e.dst).distinct())
            .count()
          assert(unused == 0, s"${cq.name} edge ${e.id}: $unused AG edges in no embedding")
        }
      } finally { emb.unpersist(); () }
    }
  }

  test("cyclic workload query: AG is a superset of the embedded edges") {
    val ts = Fixtures.yago(spark, 0.01)
    val cat = Fixtures.yagoCatalog(spark, 0.01)
    val cq = YagoQueries.d8
    val chords = Triangulator.chords(cq, cat)
    val ag = AnswerGraphBuilder.build(ts, cq, Edgifier.plan(cq, cat), chords)
    val emb = Defactorizer.embeddings(ag).cache()
    try {
      for (e <- cq.edges) {
        val missing = emb.select(e.src, e.dst).distinct()
          .except(ag.edges(e.id))
          .count()
        assert(missing == 0, s"${cq.name} edge ${e.id}: $missing embedded edges missing from AG")
      }
    } finally { emb.unpersist(); () }
  }

  test("edge burnback on a cyclic workload query yields the iAG") {
    val ts = Fixtures.yago(spark, 0.003)
    val cat = Catalog.build(ts.triples)
    val cq = YagoQueries.d9
    val chords = Triangulator.chords(cq, cat)
    val ag = AnswerGraphBuilder.build(ts, cq, Edgifier.plan(cq, cat), chords,
      edgeBurnback = true)
    val emb = Defactorizer.embeddings(ag).cache()
    try {
      for (e <- cq.edges) {
        val unused = ag.edges(e.id)
          .except(emb.select(e.src, e.dst).distinct())
          .count()
        assert(unused == 0, s"${cq.name} edge ${e.id}: $unused spurious AG edges")
      }
    } finally { emb.unpersist(); () }
  }

  test("AG of an empty-result query is empty everywhere") {
    val ts = Fixtures.chainData(spark)
    val cq = ConjunctiveQuery("empty", Vector(
      QueryEdge(0, "w", "A", "x"), QueryEdge(1, "x", "Z", "y")))
    val cat = Catalog.build(ts.triples)
    val ag = AnswerGraphBuilder.build(ts, cq, Edgifier.plan(cq, cat))
    assert(ag.size == 0)
    assert(ag.nodeSizes.values.forall(_ == 0))
  }
}
