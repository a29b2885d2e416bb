package repro.core

import repro.SparkSpec
import repro.rdf.TripleStore

/** 1-gram and 2-gram statistics against hand-computed values. */
class CatalogSpec extends SparkSpec {

  // A: {(1,10),(2,10),(3,11)}  B: {(10,20),(11,20),(12,21)}
  private lazy val ts = TripleStore(spark, Seq(
    (1L, "A", 10L), (2L, "A", 10L), (3L, "A", 11L),
    (10L, "B", 20L), (11L, "B", 20L), (12L, "B", 21L),
  ))
  private lazy val cat = Catalog.build(ts.triples)

  test("1-gram counts") {
    assert(cat.stats("A") == PredStats(3, 3, 2))
    assert(cat.stats("B") == PredStats(3, 3, 2))
  }

  test("total triples and distinct nodes") {
    assert(cat.nTriples == 6)
    // nodes: 1,2,3,10,11,12,20,21
    assert(cat.nNodes == 8)
  }

  test("missing predicate yields zero stats") {
    assert(cat.stats("nope") == PredStats(0, 0, 0))
    assert(cat.stats("nope").fanout('s') == 0.0)
  }

  test("fanout is count over distinct end") {
    assert(cat.stats("A").fanout('s') == 1.0)
    assert(cat.stats("A").fanout('o') == 1.5)
  }

  test("2-gram overlap: A objects vs B subjects share {10, 11}") {
    assert(cat.overlap("A", 'o', "B", 's') == 2)
  }

  test("2-gram overlap is symmetric in lookup") {
    assert(cat.overlap("B", 's', "A", 'o') == 2)
  }

  test("2-gram overlap: A objects vs B objects are disjoint") {
    assert(cat.overlap("A", 'o', "B", 'o') == 0)
  }

  test("2-gram self overlap equals distinct count") {
    assert(cat.overlap("A", 's', "A", 's') == 3)
    assert(cat.overlap("A", 'o', "A", 'o') == 2)
  }

  test("containment selectivity") {
    // 2 of A's 2 distinct objects appear as B subjects.
    assert(cat.containment("A", 'o', "B", 's') == 1.0)
    // 2 of B's 3 distinct subjects appear as A objects.
    assert(math.abs(cat.containment("B", 's', "A", 'o') - 2.0 / 3) < 1e-12)
    assert(cat.containment("nope", 's', "A", 's') == 0.0)
  }

  test("catalog over YagoLite covers every generated predicate") {
    val cat = Fixtures.yagoCatalog(spark, 0.01)
    for (p <- repro.rdf.YagoLite.Predicates)
      assert(cat.stats(p).count > 0, s"predicate $p missing from catalog")
  }

  test("YagoLite 1-gram counts match direct aggregation") {
    val ts = Fixtures.yago(spark, 0.01)
    val cat = Fixtures.yagoCatalog(spark, 0.01)
    val actedIn = ts.byPred("actedIn")
    assert(cat.stats("actedIn").count == actedIn.count())
    assert(cat.stats("actedIn").distinctS == actedIn.select("s").distinct().count())
    assert(cat.stats("actedIn").distinctO == actedIn.select("o").distinct().count())
  }

  test("YagoLite 2-gram sanity: actedIn movies overlap created movies") {
    val cat = Fixtures.yagoCatalog(spark, 0.01)
    assert(cat.overlap("actedIn", 'o', "created", 'o') > 0)
    // persons and movies never meet: actedIn subjects vs objects disjoint.
    assert(cat.overlap("actedIn", 's', "actedIn", 'o') == 0)
  }
}
