package repro.core

/** Phase 2 (paper §4.II): generate the embedding tuples from the answer
  * graph by joining its edge tables.
  *
  * For an acyclic CQ evaluated from its ideal answer graph the join
  * order is immaterial (no intermediate tuple is ever lost); for cyclic
  * or non-ideal AGs it matters, and the paper's prototype uses a greedy
  * order from phase-1 statistics — as do we: start from the smallest AG
  * edge and repeatedly join the smallest connected one.
  */
object Defactorizer {

  /** The greedy connected join order over the CQ's edges, by ascending
    * AG-edge size. Exposed for tests and metrics.
    */
  def joinOrder(ag: AnswerGraph): Vector[QueryEdge] = {
    val cq = ag.cq
    val remaining = scala.collection.mutable.Set(cq.edges.map(_.id): _*)
    def size(id: Int): Long = ag.edgeSizes.getOrElse(id, Long.MaxValue)
    val order = Vector.newBuilder[QueryEdge]
    val bound = scala.collection.mutable.Set[String]()
    val first = cq.edges.minBy(e => size(e.id))
    order += first; remaining -= first.id; bound ++= first.vars
    while (remaining.nonEmpty) {
      val next = cq.edges
        .filter(e => remaining.contains(e.id) && e.vars.exists(bound.contains))
        .minBy(e => size(e.id))
      order += next; remaining -= next.id; bound ++= next.vars
    }
    order.result()
  }

  /** The embedding tuples: one column per query variable, one row per
    * homomorphic embedding.
    */
  def embeddings(ag: AnswerGraph): org.apache.spark.sql.DataFrame = {
    val order = joinOrder(ag)
    val bound = scala.collection.mutable.Set(order.head.vars: _*)
    var df = ag.edges(order.head.id)
    for (e <- order.tail) {
      val shared = e.vars.filter(bound.contains)
      df = df.join(ag.edges(e.id), shared)
      bound ++= e.vars
    }
    df.select(ag.cq.vars.head, ag.cq.vars.tail: _*)
  }
}
