package repro.bench

import repro.SparkSpec
import repro.harness.Table1Harness
import repro.workload.YagoQueries

/** Reproduces the paper's Table 1 (its only table) on the YagoLite
  * dataset: direct-join baseline (the PG-style one-phase evaluation) vs
  * WIREFRAME, with |AG| and |embeddings| per query.
  *
  * Scale factor via BENCH_SF (default 1.0 ≈ 1.5M triples), repetitions
  * via BENCH_REPS (default 3: first run warms up and is dropped). The
  * harness itself asserts WIREFRAME's embedding count equals the
  * baseline's for every query; the tests here assert the paper's
  * qualitative claims hold in our measurements (EXPERIMENTS.md spells
  * out why the margins, not the direction, differ from the paper's
  * disk-based competitors).
  */
class Table1Bench extends SparkSpec {

  private lazy val rows = {
    val sf   = sys.env.getOrElse("BENCH_SF", "1.0").toDouble
    val reps = sys.env.getOrElse("BENCH_REPS", "3").toInt
    val out  = Table1Harness.run(spark, sf, reps, "target/bench-data")
    println(Table1Harness.render(out))
    out
  }

  private def snowflakes = rows.filter(_.shape == "snowflake")
  private def diamonds   = rows.filter(_.shape == "diamond")
  private def ratio(r: Table1Harness.Row): Double =
    r.nEmbeddings.toDouble / r.agSize.max(1)

  test("Table 1 runs the full 5 + 5 workload") {
    assert(rows.map(_.query) == YagoQueries.all.map(_.name))
    assert(snowflakes.size == 5 && diamonds.size == 5)
  }

  test("every query returns embeddings (mined queries are non-empty)") {
    for (r <- rows) assert(r.nEmbeddings > 0, r.query)
  }

  test("paper claim: snowflake answer graphs are orders of magnitude " +
       "smaller than their embedding sets") {
    for (r <- snowflakes)
      assert(ratio(r) > 50, f"${r.query}: |emb|/|AG| = ${ratio(r)}%.1f, expected >> 1")
  }

  test("paper claim: WIREFRAME beats the one-phase baseline on snowflakes " +
       "(each but at most one, and in the aggregate)") {
    val wins = snowflakes.count(r => r.wfMs < r.baselineMs)
    assert(wins >= 4, s"WIREFRAME won only $wins of 5 snowflakes: " +
      snowflakes.map(r => s"${r.query} wf=${r.wfMs} base=${r.baselineMs}").mkString(", "))
    val geo = math.exp(snowflakes
      .map(r => math.log(r.baselineMs.max(1).toDouble / r.wfMs.max(1))).sum / snowflakes.size)
    assert(geo > 1.0, f"geometric-mean snowflake speedup $geo%.2fx is not > 1")
  }

  test("paper claim: cyclic AGs (node burnback only) sit relatively much " +
       "closer to their embedding counts than snowflake iAGs") {
    assert(diamonds.map(ratio).max < snowflakes.map(ratio).min,
      s"diamond ratios ${diamonds.map(ratio)} should all undercut " +
      s"snowflake ratios ${snowflakes.map(ratio)}")
  }

  test("fixpoint terminates within the round cap on every query") {
    for (r <- rows) assert(r.rounds <= 10, s"${r.query}: ${r.rounds}")
  }
}
