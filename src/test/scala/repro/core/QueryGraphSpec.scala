package repro.core

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.Gen
import repro.PropHelpers
import repro.workload.YagoQueries

/** Query-graph model: variables, adjacency, connectivity, cycle
  * detection, fundamental cycles.
  */
class QueryGraphSpec extends AnyFunSuite with PropHelpers {

  private val chain = Fixtures.chainCq
  private val diamond = Fixtures.diamondCq

  test("vars in first-appearance order") {
    assert(chain.vars == Vector("w", "x", "y", "z"))
    assert(diamond.vars == Vector("a", "b", "c", "d"))
  }

  test("byId indexes every edge") {
    assert(chain.byId.keySet == Set(0, 1, 2))
    assert(chain.byId(1).pred == "B")
  }

  test("incident lists every touching edge") {
    assert(chain.incident("x").map(_.id) == Vector(0, 1))
    assert(diamond.incident("d").map(_.id) == Vector(2, 3))
  }

  test("edge end and other") {
    val e = chain.edges.head
    assert(e.end("w") == 's' && e.end("x") == 'o')
    assert(e.other("w") == "x" && e.other("x") == "w")
  }

  test("self-loop edges rejected") {
    intercept[IllegalArgumentException](QueryEdge(0, "a", "P", "a"))
  }

  test("duplicate edge ids rejected") {
    intercept[IllegalArgumentException](ConjunctiveQuery("bad",
      Vector(QueryEdge(0, "a", "P", "b"), QueryEdge(0, "b", "Q", "c"))))
  }

  test("disconnected query rejected") {
    intercept[IllegalArgumentException](ConjunctiveQuery("bad",
      Vector(QueryEdge(0, "a", "P", "b"), QueryEdge(1, "c", "Q", "d"))))
  }

  test("chain is acyclic, diamond and triangle are cyclic") {
    assert(!chain.isCyclic)
    assert(diamond.isCyclic)
    val triangle = ConjunctiveQuery("tri", Vector(
      QueryEdge(0, "a", "P", "b"), QueryEdge(1, "b", "Q", "c"), QueryEdge(2, "c", "R", "a")))
    assert(triangle.isCyclic)
  }

  test("parallel edges between the same pair count as a cycle") {
    val multi = ConjunctiveQuery("multi", Vector(
      QueryEdge(0, "a", "P", "b"), QueryEdge(1, "a", "Q", "b")))
    assert(multi.isCyclic)
  }

  test("every workload snowflake is an acyclic 9-edge tree") {
    for (cq <- YagoQueries.snowflakes) {
      assert(!cq.isCyclic, cq.name)
      assert(cq.edges.size == 9, cq.name)
      assert(cq.vars.size == 10, cq.name)
    }
  }

  test("every workload diamond is a cyclic 4-cycle") {
    for (cq <- YagoQueries.diamonds) {
      assert(cq.isCyclic, cq.name)
      assert(cq.edges.size == 4 && cq.vars.size == 4, cq.name)
    }
  }

  test("isConnected on subsets") {
    assert(chain.isConnected(Set(0, 1)))
    assert(chain.isConnected(Set.empty))
    assert(!chain.isConnected(Set(0, 2)))
    assert(chain.isConnected(Set(0, 1, 2)))
  }

  test("boundVars accumulates endpoint variables") {
    assert(chain.boundVars(Set(0)) == Set("w", "x"))
    assert(chain.boundVars(Set(0, 1)) == Set("w", "x", "y"))
  }

  test("frontier returns exactly the connected next edges") {
    assert(chain.frontier(Set(0)).map(_.id) == Vector(1))
    assert(chain.frontier(Set(1)).map(_.id).toSet == Set(0, 2))
    assert(diamond.frontier(Set(0)).map(_.id).toSet == Set(1, 2))
  }

  test("fundamental cycles: none for trees, the 4-cycle for diamonds") {
    assert(chain.fundamentalCycles.isEmpty)
    val cycles = diamond.fundamentalCycles
    assert(cycles.size == 1)
    assert(cycles.head.toSet == Set("a", "b", "c", "d"))
    assert(cycles.head.size == 4)
  }

  test("fundamental cycle vertices are cycle-adjacent in the query graph") {
    val c = diamond.fundamentalCycles.head
    for (i <- c.indices) {
      val (u, v) = (c(i), c((i + 1) % c.size))
      assert(diamond.edges.exists(e => e.touches(u) && e.touches(v)),
        s"no query edge between cycle neighbours $u and $v")
    }
  }

  test("pentagon query has one 5-cycle") {
    val penta = ConjunctiveQuery("penta", (0 until 5).map(i =>
      QueryEdge(i, s"v$i", s"P$i", s"v${(i + 1) % 5}")).toVector)
    assert(penta.isCyclic)
    assert(penta.fundamentalCycles.map(_.size) == Vector(5))
  }

  // --- property tests -------------------------------------------------

  private val pathGen: Gen[ConjunctiveQuery] = for {
    n <- Gen.choose(2, 8)
  } yield ConjunctiveQuery(s"path$n", (0 until n - 1).map(i =>
    QueryEdge(i, s"v$i", s"P$i", s"v${i + 1}")).toVector)

  test("property: paths are acyclic and their closing edge creates one cycle") {
    forAllSamples(pathGen) { cq =>
      assert(!cq.isCyclic)
      val n = cq.edges.size + 1
      val closed = ConjunctiveQuery(cq.name + "c",
        cq.edges :+ QueryEdge(n, s"v${n - 1}", "back", "v0"))
      assert(closed.isCyclic)
      assert(closed.fundamentalCycles.size == 1)
      assert(closed.fundamentalCycles.head.size == n)
    }
  }

  test("property: random trees are acyclic and connected") {
    val treeGen: Gen[ConjunctiveQuery] = for {
      n <- Gen.choose(2, 10)
      parents <- Gen.sequence[Vector[Int], Int]((1 until n).map(i => Gen.choose(0, i - 1)))
    } yield ConjunctiveQuery("tree", parents.zipWithIndex.map { case (p, i) =>
      QueryEdge(i, s"v$p", s"P$i", s"v${i + 1}")
    })
    forAllSamples(treeGen) { cq =>
      assert(!cq.isCyclic)
      assert(cq.isConnected(cq.edges.map(_.id).toSet))
      assert(cq.fundamentalCycles.isEmpty)
    }
  }

  test("property: frontier never contains already-chosen or disconnected edges") {
    forAllSamples(pathGen) { cq =>
      val ids = cq.edges.map(_.id)
      for (k <- 1 until ids.size) {
        val chosen = ids.take(k).toSet
        val f = cq.frontier(chosen)
        assert(f.forall(e => !chosen.contains(e.id)))
        assert(f.forall(e => e.vars.exists(cq.boundVars(chosen).contains)))
      }
    }
  }
}
