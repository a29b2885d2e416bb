package repro.core

import repro.{Oracle, SparkSpec}
import repro.workload.YagoQueries

/** The direct-join baseline against handcrafted answers and DuckDB. */
class BaselineSpec extends SparkSpec {

  test("chain baseline returns the designed embeddings") {
    val ts = Fixtures.chainData(spark)
    val rows = Baseline.dataFrame(ts, Fixtures.chainCq).collect()
      .map(r => (r.getLong(0), r.getLong(1), r.getLong(2), r.getLong(3))).toSet
    assert(rows.size == 6 && rows.contains((1L, 10L, 20L, 31L)))
  }

  test("diamond baseline returns the designed embeddings") {
    val ts = Fixtures.diamondData(spark)
    val rows = Baseline.dataFrame(ts, Fixtures.diamondCq).collect()
      .map(r => (r.getLong(0), r.getLong(1), r.getLong(2), r.getLong(3))).toSet
    assert(rows == Fixtures.diamondEmbeddings)
  }

  test("baseline columns are the query variables in order") {
    val ts = Fixtures.diamondData(spark)
    assert(Baseline.dataFrame(ts, Fixtures.diamondCq).columns.toSeq == Seq("a", "b", "c", "d"))
  }

  test("baseline agrees with DuckDB on workload queries at small scale") {
    val ts = Fixtures.yago(spark, 0.003)
    ts.createOrReplaceTempView("triples")
    for (cq <- Seq(YagoQueries.s2, YagoQueries.d8)) {
      val sql = SqlGen.select(cq)
      Oracle.assertEquivalent(Baseline.dataFrame(ts, cq), sql, "triples" -> ts.triples)
    }
  }

  test("timedCount returns the same count as dataFrame") {
    val ts = Fixtures.chainData(spark)
    val (n, ms) = Baseline.timedCount(ts, Fixtures.chainCq)
    assert(n == 6)
    assert(ms >= 0)
  }
}
