package repro.core

import org.apache.spark.sql.DataFrame
import repro.rdf.TripleStore

/** The one-phase direct evaluation every competitor system in Table 1
  * performs: an n-way self-join of the triple table, materializing
  * k-ary intermediate tuples from the full data graph with no
  * factorization and no semi-join pruning (DESIGN.md §3.3).
  *
  * Joins proceed in the query's written edge order (next connected
  * edge), as a classical engine without cost-based join reordering
  * would; Catalyst plans each binary join but — with CBO off and no
  * table stats — keeps the given order.
  */
object Baseline {

  /** The embeddings, one column per query variable, by direct join. */
  def dataFrame(ts: TripleStore, cq: ConjunctiveQuery): DataFrame = {
    val remaining = scala.collection.mutable.ListBuffer(cq.edges: _*)
    val first = remaining.remove(0)
    val bound = scala.collection.mutable.Set(first.vars: _*)
    var df = ts.byPred(first.pred).toDF(first.src, first.dst)
    while (remaining.nonEmpty) {
      val i = remaining.indexWhere(_.vars.exists(bound.contains))
      require(i >= 0, s"${cq.name}: disconnected query graph")
      val e = remaining.remove(i)
      val shared = e.vars.filter(bound.contains)
      df = df.join(ts.byPred(e.pred).toDF(e.src, e.dst), shared)
      bound ++= e.vars
    }
    df.select(cq.vars.head, cq.vars.tail: _*)
  }

  /** Count of embeddings plus wall time in milliseconds. */
  def timedCount(ts: TripleStore, cq: ConjunctiveQuery): (Long, Long) = {
    val t0 = System.nanoTime()
    val n = dataFrame(ts, cq).count()
    val ms = (System.nanoTime() - t0) / 1000000L
    (n, ms)
  }
}
