package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.workload.YagoQueries

/** Chord selection: counts, triangle structure, DP weight-minimization,
  * and dependency ordering.
  */
class TriangulatorSpec extends AnyFunSuite {

  private def cycleCq(n: Int): ConjunctiveQuery =
    ConjunctiveQuery(s"cycle$n", (0 until n).map(i =>
      QueryEdge(i, s"v$i", s"P$i", s"v${(i + 1) % n}")).toVector)

  private def catFor(cq: ConjunctiveQuery): Catalog = Fixtures2.uniformCatalog(cq)

  test("acyclic queries get no chords") {
    for (cq <- YagoQueries.snowflakes)
      assert(Triangulator.chords(cq, catFor(cq)).isEmpty, cq.name)
    assert(Triangulator.chords(Fixtures.chainCq, catFor(Fixtures.chainCq)).isEmpty)
  }

  test("triangles get no chords") {
    val tri = cycleCq(3)
    assert(Triangulator.chords(tri, catFor(tri)).isEmpty)
  }

  test("an n-cycle gets n-3 chords") {
    for (n <- 4 to 8) {
      val cq = cycleCq(n)
      assert(Triangulator.chords(cq, catFor(cq)).size == n - 3, s"cycle$n")
    }
  }

  test("diamond chord connects opposite corners and has two triangles") {
    val cq = Fixtures.diamondCq
    val cs = Triangulator.chords(cq, catFor(cq))
    assert(cs.size == 1)
    val c = cs.head
    assert(c.triangles.size == 2)
    // Opposite pairs in the 4-cycle a-b-d-c: (a,d) or (b,c).
    assert(Set(Set(c.u, c.v)).subsetOf(Set(Set("a", "d"), Set("b", "c"))))
    // The two triangles cover all four query edges as sides.
    val sideEdgeIds = c.triangles.flatMap(t => Seq(t.sideA, t.sideB)).collect {
      case EdgeSide(id, _, _) => id
    }
    assert(sideEdgeIds.toSet == Set(0, 1, 2, 3))
  }

  test("every workload diamond gets exactly one two-triangle chord") {
    for (cq <- YagoQueries.diamonds) {
      val cs = Triangulator.chords(cq, catFor(cq))
      assert(cs.size == 1, cq.name)
      assert(cs.head.triangles.size == 2, cq.name)
    }
  }

  test("triangle sides share the apex with the chord ends") {
    val cq = cycleCq(6)
    for (c <- Triangulator.chords(cq, catFor(cq)); t <- c.triangles) {
      assert(Set(t.sideA.u, t.sideA.v) == Set(c.u, t.apex))
      assert(Set(t.sideB.u, t.sideB.v) == Set(t.apex, c.v))
    }
  }

  test("chords only reference lower-id chords in at least one triangle") {
    val cq = cycleCq(7)
    for (c <- Triangulator.chords(cq, catFor(cq))) {
      val computable = c.triangles.exists(t =>
        Seq(t.sideA, t.sideB).forall {
          case EdgeSide(_, _, _)   => true
          case ChordSide(id, _, _) => id < c.id
        })
      assert(computable, s"chord ${c.id} has no bootstrap triangle")
    }
  }

  test("DP picks the cheaper diamond chord") {
    // Make variables b, c tiny and a, d huge: chord (b,c) must win over (a,d).
    val cq = Fixtures.diamondCq // edges a-P->b, a-Q->c, b-R->d, c-S->d
    val one = Map(
      "P" -> PredStats(1000, 10000, 5), // b is tiny as P's object
      "Q" -> PredStats(1000, 10000, 5), // c is tiny as Q's object
      "R" -> PredStats(1000, 5, 10000),
      "S" -> PredStats(1000, 5, 10000))
    val two = (for {
      p1 <- one.keys; p2 <- one.keys; e1 <- Seq('s', 'o'); e2 <- Seq('s', 'o')
    } yield (p1, e1, p2, e2) -> 5L).toMap
    val cat = Catalog(4000, 100000, one, two)
    val cs = Triangulator.chords(cq, cat)
    assert(cs.size == 1)
    assert(Set(cs.head.u, cs.head.v) == Set("b", "c"))
  }

  test("chord ids are dense from zero across cycles") {
    val cq = cycleCq(6)
    val cs = Triangulator.chords(cq, catFor(cq))
    assert(cs.map(_.id).sorted == (0 until cs.size).toVector)
  }
}
