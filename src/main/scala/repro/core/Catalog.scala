package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** 1-gram statistics for one edge label: triple count and distinct
  * endpoint counts (paper §4: "cardinality estimators drawn from a
  * catalog consisting of 1-gram and 2-gram edge-label statistics
  * computed offline").
  */
final case class PredStats(count: Long, distinctS: Long, distinctO: Long) {
  /** Distinct nodes at the given end (`'s'` or `'o'`). */
  def distinctEnd(end: Char): Long = if (end == 's') distinctS else distinctO
  /** Average out-fan from an `end`-side node (edges per distinct node). */
  def fanout(end: Char): Double =
    if (distinctEnd(end) == 0) 0.0 else count.toDouble / distinctEnd(end)
}

/** The offline statistics catalog.
  *
  * @param nTriples total triples in the data graph
  * @param nNodes   total distinct nodes
  * @param one      per-predicate 1-gram stats
  * @param two      2-gram stats: `(p1, end1, p2, end2) -> number of
  *                 distinct nodes appearing both as `end1` of a `p1`
  *                 edge and as `end2` of a `p2` edge. Symmetric.
  */
final case class Catalog(nTriples: Long, nNodes: Long,
                         one: Map[String, PredStats],
                         two: Map[(String, Char, String, Char), Long]) {

  def stats(pred: String): PredStats =
    one.getOrElse(pred, PredStats(0, 0, 0))

  /** Distinct nodes shared between `(p1, end1)` and `(p2, end2)`. */
  def overlap(p1: String, e1: Char, p2: String, e2: Char): Long =
    two.getOrElse((p1, e1, p2, e2), two.getOrElse((p2, e2, p1, e1), 0L))

  /** Fraction of `(p1, end1)` nodes that also occur as `(p2, end2)` —
    * the containment selectivity used when a variable constrained
    * through `(p1, end1)` is extended along a `p2` edge.
    */
  def containment(p1: String, e1: Char, p2: String, e2: Char): Double = {
    val d = stats(p1).distinctEnd(e1)
    if (d == 0) 0.0 else overlap(p1, e1, p2, e2).toDouble / d
  }
}

object Catalog {

  /** Compute the catalog from a triple DataFrame with one aggregation
    * per gram order. The 2-gram table is built from the distinct
    * (node, predicate, end) role relation self-joined on node: since a
    * node carries at most `2 * |predicates|` roles, the join is linear
    * in practice.
    */
  def build(triples: DataFrame): Catalog = {
    val oneRows = triples.groupBy("p").agg(
      count(lit(1)) as "cnt",
      countDistinct("s") as "ds",
      countDistinct("o") as "dos",
    ).collect()
    val one = oneRows.map { r =>
      r.getString(0) -> PredStats(r.getLong(1), r.getLong(2), r.getLong(3))
    }.toMap

    val roles = triples.select(col("s") as "node", col("p"), lit("s") as "e")
      .unionByName(triples.select(col("o") as "node", col("p"), lit("o") as "e"))
      .distinct()
      .cache()
    val nNodes = roles.select("node").distinct().count()
    val r1 = roles.select(col("node"), col("p") as "p1", col("e") as "e1")
    val r2 = roles.select(col("node"), col("p") as "p2", col("e") as "e2")
    val twoRows = r1.join(r2, "node")
      .groupBy("p1", "e1", "p2", "e2")
      .agg(count(lit(1)) as "shared")
      .collect()
    roles.unpersist()
    val two = twoRows.map { r =>
      (r.getString(0), r.getString(1).head, r.getString(2), r.getString(3).head) -> r.getLong(4)
    }.toMap

    val total = one.values.map(_.count).sum
    Catalog(total, nNodes, one, two)
  }
}
