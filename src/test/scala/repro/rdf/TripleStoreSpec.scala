package repro.rdf

import repro.SparkSpec
import repro.core.Fixtures

/** Parquet round-trips, predicate access, and view registration. */
class TripleStoreSpec extends SparkSpec {

  private lazy val ts = TripleStore(spark, Seq(
    (1L, "A", 2L), (2L, "B", 3L), (3L, "A", 4L)))

  test("byPred filters and projects") {
    val rows = ts.byPred("A").collect().map(r => (r.getLong(0), r.getLong(1))).toSet
    assert(rows == Set((1L, 2L), (3L, 4L)))
    assert(ts.byPred("A").columns.toSeq == Seq("s", "o"))
  }

  test("byPred on a missing predicate is empty") {
    assert(ts.byPred("Z").count() == 0)
  }

  test("count and predicates") {
    assert(ts.count() == 3)
    assert(ts.predicates() == Seq("A", "B"))
  }

  test("parquet round-trip preserves the triples, partitioned by predicate") {
    val dir = java.nio.file.Files.createTempDirectory("ts").toString
    val path = s"$dir/triples"
    ts.writeParquet(path)
    // Physical layout: one directory per predicate (the predicate index).
    val parts = new java.io.File(path).listFiles().map(_.getName).filter(_.startsWith("p="))
    assert(parts.toSet == Set("p=A", "p=B"))
    val back = TripleStore.readParquet(spark, path)
    assert(back.count() == 3)
    assert(back.triples.exceptAll(ts.triples.select("s", "p", "o")).count() == 0)
  }

  test("parquet round-trip at YagoLite scale") {
    val dir = java.nio.file.Files.createTempDirectory("ts2").toString
    val path = s"$dir/yago"
    val orig = Fixtures.yago(spark, 0.005)
    orig.writeParquet(path)
    val back = TripleStore.readParquet(spark, path)
    assert(back.count() == orig.count())
  }

  test("temp view registration works for SQL access") {
    ts.createOrReplaceTempView("tv_triples")
    assert(spark.sql("SELECT count(*) AS c FROM tv_triples WHERE p = 'A'").head.getLong(0) == 2)
  }
}
