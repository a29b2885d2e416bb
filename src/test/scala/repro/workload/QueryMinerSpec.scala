package repro.workload

import repro.SparkSpec
import repro.core.{Baseline, Catalog, Fixtures}
import repro.workload.QueryMiner.TemplateEdge

/** The query miner: template instantiation, catalog screening, and that
  * screened-in queries are indeed non-empty on the data.
  */
class QueryMinerSpec extends SparkSpec {

  private lazy val ts = Fixtures.yago(spark, 0.01)
  private lazy val cat = Fixtures.yagoCatalog(spark, 0.01)

  // A 2-edge path template: person -slot0-> x, person -slot1-> y pivoted
  // on a shared person.
  private val template = Vector(
    TemplateEdge("a", Left(0), "b"),
    TemplateEdge("a", Left(1), "c"),
  )

  test("mining enumerates the candidate cross product") {
    val mined = QueryMiner.mine("m", template,
      Vector(Seq("diedIn", "wasBornIn"), Seq("isCitizenOf", "livesIn")), cat)
    assert(mined.size <= 4 && mined.nonEmpty)
  }

  test("mined queries carry instantiated predicates") {
    val mined = QueryMiner.mine("m", template,
      Vector(Seq("diedIn"), Seq("isCitizenOf")), cat)
    assert(mined.head.edges.map(_.pred) == Vector("diedIn", "isCitizenOf"))
  }

  test("fixed labels pass through") {
    val t = Vector(TemplateEdge("a", Right("actedIn"), "m"), TemplateEdge("b", Right("actedIn"), "m"))
    val mined = QueryMiner.mine("co", t, Vector.empty, cat)
    assert(mined.size == 1 && mined.head.edges.forall(_.pred == "actedIn"))
  }

  test("screen rejects labels absent from the data") {
    val t = Vector(TemplateEdge("a", Right("noSuchPred"), "b"))
    assert(QueryMiner.mine("none", t, Vector.empty, cat).isEmpty)
  }

  test("screen rejects joins whose 2-gram overlap is empty") {
    // A person's attribute object (a city) never acts in a movie.
    val t = Vector(
      TemplateEdge("a", Right("diedIn"), "b"),
      TemplateEdge("b", Right("actedIn"), "m"),
    )
    assert(QueryMiner.mine("dead-end", t, Vector.empty, cat).isEmpty)
  }

  test("screened-in mined queries are non-empty on the data") {
    val mined = QueryMiner.mine("m", template,
      Vector(Seq("diedIn", "wasBornIn"), Seq("isCitizenOf", "livesIn")), cat)
    for (cq <- mined)
      assert(Baseline.dataFrame(ts, cq).limit(1).count() == 1, s"${cq.name} mined empty")
  }

  test("the fixed Table-1 workload passes the miner's screen") {
    for (cq <- YagoQueries.all)
      assert(QueryMiner.screen(cq, cat), s"${cq.name} fails the catalog screen")
  }
}
