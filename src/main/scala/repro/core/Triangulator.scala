package repro.core

/** A side of a triangle: either an original query edge or a previously
  * introduced chord.
  */
sealed trait Side { def u: String; def v: String }
/** A query edge as a triangle side (referenced by edge id). */
final case class EdgeSide(edgeId: Int, u: String, v: String) extends Side
/** A chord as a triangle side (referenced by chord id). */
final case class ChordSide(chordId: Int, u: String, v: String) extends Side

/** One triangle of the chordification: the chord `(u, v)` is supported
  * through `apex` by the two sides `(u, apex)` and `(apex, v)`. During
  * evaluation the chord's pair set is the join of its two sides
  * projected to `(u, v)`, intersected across all the chord's triangles
  * (paper §4.I, "The Triangulator").
  */
final case class Triangle(apex: String, sideA: Side, sideB: Side)

/** A chord added by triangulation, with every triangle it participates
  * in. In a full polygon triangulation every chord sits between exactly
  * two triangles. Chord ids are assigned in increasing cycle-span order,
  * so each chord has at least one triangle whose sides are query edges
  * or lower-id chords — the evaluator materializes in id order from
  * those triangles and uses the remaining ones as fixpoint refinements.
  */
final case class Chord(id: Int, u: String, v: String, triangles: Vector[Triangle])

/** The Triangulator (paper §4.I): for cyclic CQs, cycles of length > 3
  * are triangulated by adding chord edges, chosen by a bottom-up dynamic
  * program (minimum-weight polygon triangulation, weights from catalog
  * node-cardinality estimates). The paper's workload is unicyclic
  * (diamonds); independent fundamental cycles are triangulated
  * separately (DESIGN.md §7).
  */
object Triangulator {

  /** Static per-variable node-cardinality estimate: the tightest
    * distinct-endpoint bound over the variable's incident edges.
    */
  private def varCard(cq: ConjunctiveQuery, cat: Catalog)(v: String): Double =
    cq.incident(v).map(e => cat.stats(e.pred).distinctEnd(e.end(v)).toDouble).min

  /** Chords for every fundamental cycle of length >= 4. */
  def chords(cq: ConjunctiveQuery, cat: Catalog): Vector[Chord] = {
    if (!cq.isCyclic) return Vector.empty
    val out = Vector.newBuilder[Chord]
    var nextId = 0
    for (cycle <- cq.fundamentalCycles if cycle.length >= 4) {
      val produced = triangulateCycle(cq, cat, cycle, nextId)
      nextId += produced.size
      out ++= produced
    }
    out.result()
  }

  /** Minimum-weight triangulation of one cycle `c(0) .. c(L-1)` (vars in
    * cycle order; consecutive vars, cyclically, are joined by query
    * edges). Weight of chord `(a, b)` is `card(a) * card(b) / nNodes`,
    * a proxy for its materialized pair count.
    */
  private def triangulateCycle(cq: ConjunctiveQuery, cat: Catalog,
                               cycle: Vector[String], baseId: Int): Vector[Chord] = {
    val L = cycle.length
    val card = cycle.map(varCard(cq, cat)).toArray
    def w(i: Int, j: Int): Double =
      card(i) * card(j) / math.max(1.0, cat.nNodes.toDouble)
    def isPolygonEdge(a: Int, b: Int): Boolean = {
      val d = math.abs(a - b); d == 1 || d == L - 1
    }

    // dp(i)(j): min total chord weight to triangulate the sub-polygon
    // over cycle vertices i..j; chords charged where introduced.
    val dp = Array.fill(L, L)(0.0)
    val split = Array.fill(L, L)(-1)
    for (span <- 2 until L; i <- 0 until L - span) {
      val j = i + span
      var bestCost = Double.MaxValue; var bestK = -1
      for (k <- i + 1 until j) {
        val chordLeft  = if (k - i >= 2) w(i, k) else 0.0
        val chordRight = if (j - k >= 2) w(k, j) else 0.0
        val c = dp(i)(k) + dp(k)(j) + chordLeft + chordRight
        if (c < bestCost) { bestCost = c; bestK = k }
      }
      dp(i)(j) = bestCost; split(i)(j) = bestK
    }

    // Enumerate the triangulation's L-2 triangles as (i, k, j) index
    // triples, i < k < j.
    val tris = Vector.newBuilder[(Int, Int, Int)]
    def walk(i: Int, j: Int): Unit = {
      if (j - i < 2) return
      val k = split(i)(j)
      tris += ((i, k, j))
      walk(i, k); walk(k, j)
    }
    walk(0, L - 1)
    val triangles = tris.result()

    // Chords = triangle sides that are not polygon edges, ids by span.
    val chordPairs = triangles
      .flatMap { case (i, k, j) => Seq((i, k), (k, j), (i, j)) }
      .filterNot { case (a, b) => isPolygonEdge(a, b) }
      .distinct
      .sortBy { case (a, b) => b - a }
    val chordIds = chordPairs.zipWithIndex.map { case (p, i) => p -> (baseId + i) }.toMap

    def queryEdgeBetween(a: Int, b: Int): EdgeSide = {
      val (va, vb) = (cycle(a), cycle(b))
      val e = cq.edges
        .find(e => (e.src == va && e.dst == vb) || (e.src == vb && e.dst == va))
        .getOrElse(sys.error(s"no query edge between cycle-adjacent $va and $vb"))
      EdgeSide(e.id, va, vb)
    }
    def sideFor(a: Int, b: Int): Side = {
      val key = (math.min(a, b), math.max(a, b))
      if (isPolygonEdge(a, b)) queryEdgeBetween(a, b)
      else ChordSide(chordIds(key), cycle(key._1), cycle(key._2))
    }

    chordPairs.map { case (a, b) =>
      val ts = triangles.collect {
        case (i, k, j) if Seq((i, k), (k, j), (i, j)).contains((a, b)) =>
          val apex = Seq(i, k, j).find(x => x != a && x != b).get
          Triangle(cycle(apex), sideFor(a, apex), sideFor(apex, b))
      }
      Chord(chordIds((a, b)), cycle(a), cycle(b), ts)
    }.sortBy(_.id)
  }
}
