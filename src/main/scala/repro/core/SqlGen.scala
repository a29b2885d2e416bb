package repro.core

/** Generates the classical one-phase SQL evaluation of a CQ over a
  * triple table — one self-join per query edge. This is "what other
  * evaluation methods for CQs do" (paper §3): it drives both the
  * Catalyst baseline and the DuckDB correctness oracle, so WIREFRAME's
  * two-phase result is checked against two independent engines running
  * the same canonical query.
  */
object SqlGen {

  private def quote(s: String): String = s.replace("'", "''")

  /** `SELECT <one column per variable> FROM triples t0, t1, ... WHERE ...`
    *
    * Each variable is projected from its first occurrence and equated at
    * every later occurrence; each alias is constrained to its edge's
    * predicate. Output columns are named exactly by the query variables,
    * so Spark and DuckDB results line up column-for-column.
    */
  def select(cq: ConjunctiveQuery, table: String = "triples"): String = {
    val alias = cq.edges.indices.map(i => s"t$i")
    // First (alias, column) at which each variable is produced.
    val varExpr = scala.collection.mutable.LinkedHashMap[String, String]()
    val conds   = Vector.newBuilder[String]
    for ((e, i) <- cq.edges.zipWithIndex) {
      conds += s"${alias(i)}.p = '${quote(e.pred)}'"
      for ((v, col) <- Seq(e.src -> "s", e.dst -> "o")) {
        val expr = s"${alias(i)}.$col"
        varExpr.get(v) match {
          case Some(first) => conds += s"$first = $expr"
          case None        => varExpr(v) = expr
        }
      }
    }
    val proj = varExpr.map { case (v, expr) => s"$expr AS $v" }.mkString(", ")
    val from = alias.map(a => s"$table $a").mkString(", ")
    s"SELECT $proj FROM $from WHERE ${conds.result().mkString(" AND ")}"
  }
}
