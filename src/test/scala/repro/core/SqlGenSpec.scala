package repro.core

import repro.{Oracle, SparkSpec}

/** Generated one-phase SQL: shape, and result correctness on both
  * engines (Spark SQL and DuckDB must agree with each other).
  */
class SqlGenSpec extends SparkSpec {

  test("chain SQL projects every variable once and constrains predicates") {
    val sql = SqlGen.select(Fixtures.chainCq)
    assert(sql.startsWith("SELECT t0.s AS w, t0.o AS x, t1.o AS y, t2.o AS z FROM"))
    assert(sql.contains("t0.p = 'A'") && sql.contains("t1.p = 'B'") && sql.contains("t2.p = 'C'"))
    assert(sql.contains("t0.o = t1.s") && sql.contains("t1.o = t2.s"))
  }

  test("diamond SQL equates the shared sink variable") {
    val sql = SqlGen.select(Fixtures.diamondCq)
    assert(sql.contains("t2.o = t3.o")) // d from R's object, equated with S's object
    assert(sql.contains("t0.s = t1.s")) // a shared by P and Q
  }

  test("single-quote predicates are escaped") {
    val cq = ConjunctiveQuery("q", Vector(QueryEdge(0, "a", "it's", "b")))
    assert(SqlGen.select(cq).contains("'it''s'"))
  }

  test("Spark SQL over the chain fixture returns the six embeddings") {
    val ts = Fixtures.chainData(spark)
    ts.createOrReplaceTempView("triples")
    val rows = spark.sql(SqlGen.select(Fixtures.chainCq)).collect()
      .map(r => (r.getLong(0), r.getLong(1), r.getLong(2), r.getLong(3))).toSet
    assert(rows == Set(
      (1L, 10L, 20L, 31L), (2L, 10L, 20L, 31L), (3L, 10L, 20L, 31L),
      (1L, 10L, 20L, 33L), (2L, 10L, 20L, 33L), (3L, 10L, 20L, 33L),
    ))
  }

  test("Spark and DuckDB agree on the chain fixture") {
    val ts = Fixtures.chainData(spark)
    ts.createOrReplaceTempView("triples")
    val sql = SqlGen.select(Fixtures.chainCq)
    Oracle.assertEquivalent(spark.sql(sql), sql, "triples" -> ts.triples)
  }

  test("Spark and DuckDB agree on the diamond fixture") {
    val ts = Fixtures.diamondData(spark)
    ts.createOrReplaceTempView("triples")
    val sql = SqlGen.select(Fixtures.diamondCq)
    Oracle.assertEquivalent(spark.sql(sql), sql, "triples" -> ts.triples)
  }

  test("diamond fixture has exactly the two designed embeddings") {
    val ts = Fixtures.diamondData(spark)
    ts.createOrReplaceTempView("triples")
    val rows = spark.sql(SqlGen.select(Fixtures.diamondCq)).collect()
      .map(r => (r.getLong(0), r.getLong(1), r.getLong(2), r.getLong(3))).toSet
    assert(rows == Fixtures.diamondEmbeddings)
  }
}
