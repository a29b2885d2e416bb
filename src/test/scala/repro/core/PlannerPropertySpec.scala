package repro.core

import org.scalacheck.Gen
import org.scalatest.funsuite.AnyFunSuite
import repro.PropHelpers

/** Randomized cross-validation of the planners: the Edgifier DP against
  * brute-force enumeration over random query shapes and random
  * catalogs, and structural invariants of the Triangulator over random
  * cycles.
  */
class PlannerPropertySpec extends AnyFunSuite with PropHelpers {

  private val statsGen: Gen[PredStats] = for {
    dS <- Gen.choose(1L, 500L)
    dO <- Gen.choose(1L, 500L)
    c  <- Gen.choose(math.max(dS, dO), 5000L)
  } yield PredStats(c, dS, dO)

  /** Random catalog for `cq`: random 1-grams, random consistent 2-grams
    * (overlap never exceeds either side's distinct count).
    */
  private def catalogGen(cq: ConjunctiveQuery): Gen[Catalog] = {
    val preds = cq.edges.map(_.pred).distinct
    for {
      stats <- Gen.sequence[Vector[PredStats], PredStats](preds.map(_ => statsGen))
      fracs <- Gen.sequence[Vector[Double], Double](
        Vector.fill(preds.size * preds.size * 4)(Gen.choose(0.0, 1.0)))
    } yield {
      val one = preds.zip(stats).toMap
      var i = -1
      val two = for {
        p1 <- preds; p2 <- preds; e1 <- Seq('s', 'o'); e2 <- Seq('s', 'o')
      } yield {
        i += 1
        val cap = math.min(one(p1).distinctEnd(e1), one(p2).distinctEnd(e2))
        (p1, e1, p2, e2) -> (cap * fracs(i % fracs.size)).toLong
      }
      Catalog(one.values.map(_.count).sum, 10000, one, two.toMap)
    }
  }

  private def randomTreeCq(n: Int): Gen[ConjunctiveQuery] = for {
    parents <- Gen.sequence[Vector[Int], Int]((1 until n).map(i => Gen.choose(0, i - 1)))
    preds   <- Gen.sequence[Vector[Int], Int](Vector.fill(n - 1)(Gen.choose(0, 3)))
  } yield ConjunctiveQuery("t", parents.zipWithIndex.map { case (p, i) =>
    QueryEdge(i, s"v$p", s"P${preds(i)}", s"v${i + 1}")
  })

  private def bruteForceBest(cq: ConjunctiveQuery, cat: Catalog): Double = {
    def orders(chosen: Vector[QueryEdge]): Iterator[Vector[QueryEdge]] =
      if (chosen.size == cq.edges.size) Iterator.single(chosen)
      else {
        val next = if (chosen.isEmpty) cq.edges else cq.frontier(chosen.map(_.id).toSet)
        next.iterator.flatMap(e => orders(chosen :+ e))
      }
    orders(Vector.empty).map(o => Edgifier.planForOrder(cq, cat, o).cost).min
  }

  test("property: DP equals brute force on random trees with random catalogs") {
    val gen = for {
      n   <- Gen.choose(2, 6)
      cq  <- randomTreeCq(n)
      cat <- catalogGen(cq)
    } yield (cq, cat)
    forAllSamples(gen, 60) { case (cq, cat) =>
      val dp = Edgifier.plan(cq, cat)
      val bf = bruteForceBest(cq, cat)
      assert(math.abs(dp.cost - bf) <= 1e-6 * math.max(1.0, bf),
        s"dp=${dp.cost} brute=$bf for ${cq.edges}")
    }
  }

  test("property: DP equals brute force on random cycles") {
    val gen = for {
      n   <- Gen.choose(3, 6)
      cq  <- Gen.const(ConjunctiveQuery("c", (0 until n).map(i =>
               QueryEdge(i, s"v$i", s"P${i % 3}", s"v${(i + 1) % n}")).toVector))
      cat <- catalogGen(cq)
    } yield (cq, cat)
    forAllSamples(gen, 40) { case (cq, cat) =>
      val dp = Edgifier.plan(cq, cat)
      val bf = bruteForceBest(cq, cat)
      assert(math.abs(dp.cost - bf) <= 1e-6 * math.max(1.0, bf))
    }
  }

  test("property: plan cost is the sum of its step walks") {
    val gen = for {
      n <- Gen.choose(2, 6); cq <- randomTreeCq(n); cat <- catalogGen(cq)
    } yield (cq, cat)
    forAllSamples(gen, 30) { case (cq, cat) =>
      val plan = Edgifier.plan(cq, cat)
      assert(math.abs(plan.cost - plan.steps.map(_.estWalks).sum) < 1e-9)
      assert(plan.steps.forall(_.estWalks >= 0))
    }
  }

  test("property: planForOrder of the DP's own order reproduces its cost") {
    val gen = for {
      n <- Gen.choose(2, 6); cq <- randomTreeCq(n); cat <- catalogGen(cq)
    } yield (cq, cat)
    forAllSamples(gen, 30) { case (cq, cat) =>
      val plan = Edgifier.plan(cq, cat)
      assert(math.abs(Edgifier.planForOrder(cq, cat, plan.order).cost - plan.cost) < 1e-9)
    }
  }

  test("property: triangulating an n-cycle yields n-3 chords and n-2 triangles") {
    forAllSamples(Gen.choose(4, 9), 30) { n =>
      val cq = ConjunctiveQuery("c", (0 until n).map(i =>
        QueryEdge(i, s"v$i", s"P$i", s"v${(i + 1) % n}")).toVector)
      val cs = Triangulator.chords(cq, Fixtures2.uniformCatalog(cq))
      assert(cs.size == n - 3)
      // Each triangle is counted once per chord side it touches; with
      // n-2 triangles and each triangle having at least one chord side,
      // every chord must carry 2 triangles (interior) in a polygon
      // triangulation.
      assert(cs.forall(_.triangles.size == 2))
      // Triangle sides connect chord ends through the apex.
      for (c <- cs; t <- c.triangles) {
        assert(Set(t.sideA.u, t.sideA.v) == Set(c.u, t.apex))
        assert(Set(t.sideB.u, t.sideB.v) == Set(t.apex, c.v))
      }
    }
  }

  test("property: chord endpoints are never cycle-adjacent") {
    forAllSamples(Gen.choose(4, 9), 20) { n =>
      val cq = ConjunctiveQuery("c", (0 until n).map(i =>
        QueryEdge(i, s"v$i", s"P$i", s"v${(i + 1) % n}")).toVector)
      for (c <- Triangulator.chords(cq, Fixtures2.uniformCatalog(cq))) {
        assert(!cq.edges.exists(e => Set(e.src, e.dst) == Set(c.u, c.v)),
          s"chord (${c.u},${c.v}) duplicates a query edge")
      }
    }
  }
}
