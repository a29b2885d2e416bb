package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.workload.YagoQueries

/** The phase-1 DP planner: legality of the produced order, cost
  * behaviour against hand-built catalogs, and optimality against
  * brute-force enumeration of connected left-deep orders.
  */
class EdgifierSpec extends AnyFunSuite {

  /** Catalog stub: uniform 2-gram overlap = min of the distinct ends. */
  private def catalogOf(preds: (String, PredStats)*): Catalog = {
    val one = preds.toMap
    val two = for {
      (p1, s1) <- one; (p2, s2) <- one
      e1 <- Seq('s', 'o'); e2 <- Seq('s', 'o')
    } yield (p1, e1, p2, e2) -> math.min(s1.distinctEnd(e1), s2.distinctEnd(e2))
    Catalog(one.values.map(_.count).sum, 1000, one, two.toMap)
  }

  /** Brute-force cost of the cheapest connected left-deep order, using
    * the same estimator via single-step DP restricted to one order.
    */
  private def bruteForceBest(cq: ConjunctiveQuery, cat: Catalog): Double = {
    def orders(chosen: Vector[QueryEdge]): Iterator[Vector[QueryEdge]] = {
      if (chosen.size == cq.edges.size) Iterator.single(chosen)
      else {
        val next =
          if (chosen.isEmpty) cq.edges
          else cq.frontier(chosen.map(_.id).toSet)
        next.iterator.flatMap(e => orders(chosen :+ e))
      }
    }
    orders(Vector.empty).map(o => Edgifier.planForOrder(cq, cat, o).cost).min
  }

  private val chain = Fixtures.chainCq

  test("plan covers every edge exactly once") {
    val cat = catalogOf(
      "A" -> PredStats(100, 50, 20), "B" -> PredStats(10, 10, 10), "C" -> PredStats(200, 40, 80))
    val plan = Edgifier.plan(chain, cat)
    assert(plan.order.map(_.id).sorted == Vector(0, 1, 2))
  }

  test("plan is connected at every prefix") {
    val cat = catalogOf(
      "A" -> PredStats(100, 50, 20), "B" -> PredStats(10, 10, 10), "C" -> PredStats(200, 40, 80))
    for (cq <- YagoQueries.all) {
      val order = Edgifier.plan(cq, Fixtures2.uniformCatalog(cq)).order
      for (k <- 1 to order.size)
        assert(cq.isConnected(order.take(k).map(_.id).toSet), s"${cq.name} prefix $k")
    }
  }

  test("planner starts from the rarest edge when selectivities are neutral") {
    val cat = catalogOf(
      "A" -> PredStats(1000, 500, 500), "B" -> PredStats(4, 4, 4), "C" -> PredStats(1000, 500, 500))
    val plan = Edgifier.plan(chain, cat)
    assert(plan.order.head.pred == "B")
  }

  test("first step costs the predicate's full count") {
    val cat = catalogOf(
      "A" -> PredStats(1000, 500, 500), "B" -> PredStats(4, 4, 4), "C" -> PredStats(1000, 500, 500))
    val plan = Edgifier.plan(chain, cat)
    assert(plan.steps.head.estWalks == 4.0)
  }

  test("subsequent steps cost less than the full predicate when pruned") {
    val cat = catalogOf(
      "A" -> PredStats(1000, 500, 500), "B" -> PredStats(4, 4, 4), "C" -> PredStats(1000, 500, 500))
    val plan = Edgifier.plan(chain, cat)
    for (s <- plan.steps.tail)
      assert(s.estWalks < cat.stats(s.edge.pred).count.toDouble, s"$s")
  }

  test("DP matches brute force on the chain") {
    val cat = catalogOf(
      "A" -> PredStats(100, 50, 20), "B" -> PredStats(10, 10, 10), "C" -> PredStats(200, 40, 80))
    assert(math.abs(Edgifier.plan(chain, cat).cost - bruteForceBest(chain, cat)) < 1e-6)
  }

  test("DP matches brute force on the diamond") {
    val cq = Fixtures.diamondCq
    val cat = catalogOf(
      "P" -> PredStats(100, 80, 60), "Q" -> PredStats(20, 15, 10),
      "R" -> PredStats(300, 100, 50), "S" -> PredStats(50, 40, 30))
    assert(math.abs(Edgifier.plan(cq, cat).cost - bruteForceBest(cq, cat)) < 1e-6)
  }

  test("DP matches brute force on a 5-edge star") {
    val star = ConjunctiveQuery("star", (0 until 5).map(i =>
      QueryEdge(i, "hub", s"P$i", s"v$i")).toVector)
    val cat = catalogOf((0 until 5).map(i =>
      s"P$i" -> PredStats(10L * (i + 1), 5L * (i + 1), 3L * (i + 1))): _*)
    assert(math.abs(Edgifier.plan(star, cat).cost - bruteForceBest(star, cat)) < 1e-6)
  }

  test("plans for the full workload are legal under the YagoLite catalog") {
    for (cq <- YagoQueries.all) {
      val plan = Edgifier.plan(cq, Fixtures2.uniformCatalog(cq))
      assert(plan.order.map(_.id).toSet == cq.edges.map(_.id).toSet, cq.name)
      assert(plan.cost >= 0, cq.name)
    }
  }
}

/** Second fixture helper kept out of the Spark-bound Fixtures object so
  * pure planner tests run without a session.
  */
object Fixtures2 {
  /** A neutral catalog giving every predicate of `cq` the same stats. */
  def uniformCatalog(cq: ConjunctiveQuery): Catalog = {
    val one = cq.edges.map(_.pred).distinct.map(_ -> PredStats(100, 60, 40)).toMap
    val two = for {
      p1 <- one.keys; p2 <- one.keys; e1 <- Seq('s', 'o'); e2 <- Seq('s', 'o')
    } yield (p1, e1, p2, e2) -> 20L
    Catalog(one.values.map(_.count).sum, 1000, one, two.toMap)
  }
}
