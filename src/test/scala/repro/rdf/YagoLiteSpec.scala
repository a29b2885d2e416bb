package repro.rdf

import repro.SparkSpec
import repro.core.Fixtures
import org.apache.spark.sql.functions._

/** The synthetic YAGO2s stand-in: schema, typing, determinism, scaling,
  * and the degree skew the paper's effect depends on.
  */
class YagoLiteSpec extends SparkSpec {

  private lazy val ts = Fixtures.yago(spark, 0.01)
  private lazy val d = YagoLite.Domains(0.01)

  test("triple schema is (s: long, p: string, o: long)") {
    assert(ts.triples.schema.fieldNames.toSeq == Seq("s", "p", "o"))
    assert(ts.triples.schema("s").dataType.typeName == "long")
    assert(ts.triples.schema("p").dataType.typeName == "string")
    assert(ts.triples.schema("o").dataType.typeName == "long")
  }

  test("all advertised predicates are generated") {
    assert(ts.predicates().toSet == YagoLite.Predicates.toSet)
  }

  test("triples are distinct (RDF set semantics)") {
    assert(ts.triples.count() == ts.triples.distinct().count())
  }

  test("node domains are disjoint") {
    val ds = d.all
    for (Seq(a, b) <- ds.combinations(2)) {
      assert(a.base + a.n <= b.base || b.base + b.n <= a.base,
        s"${a.name} and ${b.name} overlap")
    }
  }

  test("domain sizes floor at one") {
    val tiny = YagoLite.Domains(1e-9)
    assert(tiny.all.forall(_.n == 1))
  }

  test("predicates are typed: actedIn is person -> movie") {
    val rows = ts.byPred("actedIn")
    val bad = rows.filter(
      !(col("s") >= d.persons.base && col("s") < d.persons.base + d.persons.n) ||
      !(col("o") >= d.movies.base && col("o") < d.movies.base + d.movies.n)
    ).count()
    assert(bad == 0)
  }

  test("isLocatedIn covers cities and orgs, targets countries") {
    val rows = ts.byPred("isLocatedIn").collect()
    assert(rows.nonEmpty)
    for (r <- rows) {
      val s = r.getLong(0); val o = r.getLong(1)
      assert(d.cities.contains(s) || d.orgs.contains(s))
      assert(d.countries.contains(o))
    }
  }

  test("functional predicates assign exactly one object per subject") {
    for (p <- Seq("wasCreatedOnDate", "hasDuration")) {
      val dup = ts.byPred(p).groupBy("s").count().filter(col("count") > 1).count()
      assert(dup == 0, s"$p is not functional")
      assert(ts.byPred(p).count() == d.movies.n, s"$p does not cover all movies")
    }
  }

  test("generation is deterministic in (sf, seed)") {
    val a = YagoLite.triples(spark, 0.005, seed = 7)
    val b = YagoLite.triples(spark, 0.005, seed = 7)
    assert(a.exceptAll(b).count() == 0 && b.exceptAll(a).count() == 0)
  }

  test("different seeds give different data") {
    val a = YagoLite.triples(spark, 0.005, seed = 7)
    val b = YagoLite.triples(spark, 0.005, seed = 8)
    assert(a.exceptAll(b).count() > 0)
  }

  test("triple count scales roughly linearly with sf") {
    val small = YagoLite.triples(spark, 0.005).count()
    val big = ts.count() // sf = 0.01
    assert(big > small * 1.5, s"sf=0.01 ($big) vs sf=0.005 ($small)")
  }

  test("linksTo is the heaviest predicate at benchmark scale, as in YAGO") {
    // At SF=0.01 the tiny target domains clamp linksTo under RDF set
    // semantics; the claim that matters is at benchmark scale.
    val big = Fixtures.yago(spark, 0.1)
    val counts = big.triples.groupBy("p").count().collect()
      .map(r => r.getString(0) -> r.getLong(1)).toMap
    assert(counts("linksTo") == counts.values.max,
      s"linksTo=${counts("linksTo")} max=${counts.values.max}")
  }

  test("movie fan-in is skewed: top movie has far more actors than the mean") {
    val perMovie = ts.byPred("actedIn").groupBy("o").count()
    val top = perMovie.agg(max("count")).head.getLong(0)
    val mean = ts.byPred("actedIn").count().toDouble / perMovie.count()
    assert(top > 4 * mean, s"top=$top mean=$mean — not skewed enough for hub fan-in")
  }
}
