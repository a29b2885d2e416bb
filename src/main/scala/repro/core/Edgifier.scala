package repro.core

/** One step of a phase-1 plan: materialize the matching edges for
  * `edge`, at an estimated retrieval cost of `estWalks` edge walks.
  */
final case class PlanStep(edge: QueryEdge, estWalks: Double)

/** An ordered phase-1 plan (left-deep: each step after the first shares
  * a variable with the already-materialized prefix).
  */
final case class Plan(steps: Vector[PlanStep]) {
  def order: Vector[QueryEdge] = steps.map(_.edge)
  def cost: Double = steps.map(_.estWalks).sum
}

/** The Edgifier (paper §4.I): a bottom-up dynamic program over connected
  * query-edge subsets that picks the cheapest order in which to
  * materialize the answer graph. The cost unit is the *edge walk* — one
  * matching edge retrieved from the data graph — estimated from the
  * catalog's 1-gram fan-outs and 2-gram containment selectivities.
  *
  * The per-step cost is a function of the *set* of already-materialized
  * edges only (not of their order), so the subset DP is exact for the
  * cost model: additive step costs + order-free state satisfy the
  * principle of optimality.
  */
object Edgifier {

  /** Estimated node-set cardinality of variable `v` once the edges in
    * `s` are materialized (None if `v` is still unbound): the tightest
    * distinct-endpoint bound over incident materialized edges, tightened
    * further by the 2-gram containment of each other incident edge.
    */
  def varCard(cq: ConjunctiveQuery, cat: Catalog, s: Set[Int], v: String): Option[Double] = {
    val inc = cq.incident(v).filter(e => s.contains(e.id))
    if (inc.isEmpty) None
    else {
      val anchor = inc.minBy(e => cat.stats(e.pred).distinctEnd(e.end(v)))
      val base = cat.stats(anchor.pred).distinctEnd(anchor.end(v)).toDouble
      Some(inc.filterNot(_.id == anchor.id).foldLeft(base) { (c, e2) =>
        c * cat.containment(anchor.pred, anchor.end(v), e2.pred, e2.end(v))
      })
    }
  }

  /** Estimated edge walks to materialize `e` after the subset `s`: the
    * full predicate count for an unconstrained first edge; otherwise the
    * surviving driver-side nodes times the predicate's fan-out, driven
    * from the cheaper bound end.
    */
  def stepWalks(cq: ConjunctiveQuery, cat: Catalog, s: Set[Int], e: QueryEdge): Double = {
    val ps = cat.stats(e.pred)
    def walksFrom(v: String): Option[Double] =
      varCard(cq, cat, s, v).map { card =>
        val inc = cq.incident(v).filter(x => s.contains(x.id))
        val anchor = inc.minBy(x => cat.stats(x.pred).distinctEnd(x.end(v)))
        val survivors = card * cat.containment(anchor.pred, anchor.end(v), e.pred, e.end(v))
        survivors * ps.fanout(e.end(v))
      }
    val options = e.vars.flatMap(walksFrom)
    if (options.isEmpty) ps.count.toDouble else options.min
  }

  /** Cost the given explicit order under the same estimator (used by the
    * benchmarks' fixed-order variants and by tests comparing the DP to
    * brute-force enumeration).
    */
  def planForOrder(cq: ConjunctiveQuery, cat: Catalog, order: Seq[QueryEdge]): Plan = {
    var s = Set.empty[Int]
    val steps = order.map { e =>
      val w = stepWalks(cq, cat, s, e)
      s += e.id
      PlanStep(e, w)
    }
    Plan(steps.toVector)
  }

  /** Optimal (under the estimator) connected left-deep edge order. */
  def plan(cq: ConjunctiveQuery, cat: Catalog): Plan = {
    val es = cq.edges
    val m = es.size
    require(m <= 20, s"${cq.name}: DP over ${1 << m} subsets is not sensible")
    // bestCost(mask) + bestOrder(mask): cheapest way to materialize mask.
    val bestCost = Array.fill(1 << m)(Double.MaxValue)
    val bestOrder = new Array[Vector[PlanStep]](1 << m)
    bestCost(0) = 0.0; bestOrder(0) = Vector.empty

    for (mask <- 0 until (1 << m); if bestOrder(mask) != null) {
      val chosenIds = (0 until m).collect { case i if (mask & (1 << i)) != 0 => es(i).id }.toSet
      val bound = cq.boundVars(chosenIds)
      for (i <- 0 until m; if (mask & (1 << i)) == 0) {
        val e = es(i)
        val connected = mask == 0 || e.vars.exists(bound.contains)
        if (connected) {
          val w = stepWalks(cq, cat, chosenIds, e)
          val nm = mask | (1 << i)
          val c = bestCost(mask) + w
          if (c < bestCost(nm)) {
            bestCost(nm) = c
            bestOrder(nm) = bestOrder(mask) :+ PlanStep(e, w)
          }
        }
      }
    }
    Plan(bestOrder((1 << m) - 1))
  }
}
