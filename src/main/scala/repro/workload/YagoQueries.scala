package repro.workload

import repro.core.{ConjunctiveQuery, QueryEdge}

/** The Table-1 workload: five snowflake-shaped (acyclic, 9-edge) and
  * five diamond-shaped (4-cycle) conjunctive queries over the YagoLite
  * schema.
  *
  * The paper mines its queries from YAGO2s with a template-driven miner
  * and prints only each query's predicate list. We instantiate the same
  * two templates with predicate lists following Table 1, adjusted where
  * a paper predicate does not type-check in the YagoLite schema
  * (DESIGN.md §3.2).
  */
object YagoQueries {

  /** The snowflake template (paper Fig. 3): two movie hubs bridged by a
    * hub person. Variables: actor `c` (attributes `x1`, `x2`) fans into
    * movie `m1`; co-actor `d` (attribute `x3`) created movie `m2`, which
    * has actor `f` and functional attributes `x4`, `x5`. A tree with 9
    * edges and 10 variables; fan-in at `m1`/`m2` times attribute
    * fan-out makes |embeddings| >> |iAG|.
    */
  def snowflake(name: String, l1: String, l2: String, l5: String): ConjunctiveQuery =
    ConjunctiveQuery(name, Vector(
      QueryEdge(0, "c", l1, "x1"),
      QueryEdge(1, "c", l2, "x2"),
      QueryEdge(2, "c", "actedIn", "m1"),
      QueryEdge(3, "d", "actedIn", "m1"),
      QueryEdge(4, "d", l5, "x3"),
      QueryEdge(5, "d", "created", "m2"),
      QueryEdge(6, "f", "actedIn", "m2"),
      QueryEdge(7, "m2", "hasDuration", "x4"),
      QueryEdge(8, "m2", "wasCreatedOnDate", "x5"),
    ))

  /** The diamond template (paper Fig. 4): an undirected 4-cycle
    * `a - b - d - c - a`; per-edge directions vary by instantiation.
    */
  def diamond(name: String, edges: Vector[QueryEdge]): ConjunctiveQuery = {
    val cq = ConjunctiveQuery(name, edges)
    require(cq.isCyclic && cq.edges.size == 4 && cq.vars.size == 4,
      s"$name is not a diamond")
    cq
  }

  // Snowflakes: predicate lists after Table 1's rows (paper row in
  // parentheses); l1/l2/l5 are the non-fixed slots of the template.
  val s1: ConjunctiveQuery = snowflake("S1", "diedIn",      "influences", "owns")          // (1)
  val s2: ConjunctiveQuery = snowflake("S2", "hasChild",    "influences", "wasBornIn")     // (2)
  val s3: ConjunctiveQuery = snowflake("S3", "isCitizenOf", "influences", "livesIn")       // (3; paper's `exports` → `livesIn`)
  val s4: ConjunctiveQuery = snowflake("S4", "isMarriedTo", "influences", "wasBornOnDate") // (4)
  val s5: ConjunctiveQuery = snowflake("S5", "isMarriedTo", "diedIn",     "wasBornIn")     // (5)

  // Diamonds: 4-cycles with the paper's predicate lists (rows 6-8; rows
  // 9-10 are illegible in the source and instantiated as schema-valid
  // analogues from the same mined template family).
  val d6: ConjunctiveQuery = diamond("D6", Vector(            // (6) livesIn/isCitizenOf/isLocatedIn/linksTo
    QueryEdge(0, "a", "livesIn", "b"),
    QueryEdge(1, "a", "isCitizenOf", "c"),
    QueryEdge(2, "b", "isLocatedIn", "d"),
    QueryEdge(3, "c", "linksTo", "d"),
  ))
  val d7: ConjunctiveQuery = diamond("D7", Vector(            // (7) livesIn/isCitizenOf/linksTo/happenedIn
    QueryEdge(0, "a", "livesIn", "b"),
    QueryEdge(1, "a", "isCitizenOf", "c"),
    QueryEdge(2, "e", "happenedIn", "b"),
    QueryEdge(3, "e", "linksTo", "c"),
  ))
  val d8: ConjunctiveQuery = diamond("D8", Vector(            // (8) diedIn/linksTo/wasBornIn/graduatedFrom → geo diamond
    QueryEdge(0, "a", "diedIn", "b"),
    QueryEdge(1, "a", "wasBornIn", "c"),
    QueryEdge(2, "b", "linksTo", "d"),
    QueryEdge(3, "c", "isLocatedIn", "d"),
  ))
  val d9: ConjunctiveQuery = diamond("D9", Vector(            // (9, analogue) education diamond
    QueryEdge(0, "a", "wasBornIn", "b"),
    QueryEdge(1, "a", "graduatedFrom", "c"),
    QueryEdge(2, "b", "isLocatedIn", "d"),
    QueryEdge(3, "c", "isLocatedIn", "d"),
  ))
  val d10: ConjunctiveQuery = diamond("D10", Vector(          // (10, analogue) co-star diamond
    QueryEdge(0, "a", "actedIn", "m1"),
    QueryEdge(1, "b", "actedIn", "m1"),
    QueryEdge(2, "a", "actedIn", "m2"),
    QueryEdge(3, "b", "actedIn", "m2"),
  ))

  val snowflakes: Vector[ConjunctiveQuery] = Vector(s1, s2, s3, s4, s5)
  val diamonds: Vector[ConjunctiveQuery]   = Vector(d6, d7, d8, d9, d10)
  val all: Vector[ConjunctiveQuery]        = snowflakes ++ diamonds

  /** The paper's Table-1 numbers for side-by-side reporting: execution
    * seconds per system (`None` = terminated after 300 s / illegible),
    * |iAG|/|AG| and |embeddings|. Keys match our query names.
    */
  final case class PaperRow(pg: Option[Int], wf: Option[Int], vt: Option[Int],
                            md: Option[Int], nj: Option[Int],
                            ag: Option[Long], embeddings: Option[Long])
  val paper: Map[String, PaperRow] = Map(
    "S1"  -> PaperRow(Some(51), Some(16), None, None, None, Some(1660L), Some(2931986L)),
    "S2"  -> PaperRow(Some(88), Some(5), Some(151), None, None, Some(993L), Some(2847184L)),
    "S3"  -> PaperRow(Some(69), Some(12), None, None, None, Some(1140L), Some(2670339L)),
    "S4"  -> PaperRow(Some(78), Some(8), None, None, None, Some(3317L), Some(2569017L)),
    "S5"  -> PaperRow(Some(42), Some(12), None, None, None, Some(10761L), Some(1306406L)),
    "D6"  -> PaperRow(None, Some(103), None, None, None, Some(833355L), Some(58785214L)),
    "D7"  -> PaperRow(None, Some(118), Some(30), None, Some(127), Some(22555L), Some(100160L)),
    "D8"  -> PaperRow(None, Some(20), Some(110), None, Some(213), Some(68720L), Some(106214L)),
    "D9"  -> PaperRow(None, None, None, None, None, None, None),
    "D10" -> PaperRow(None, None, None, None, None, None, None),
  )
}
