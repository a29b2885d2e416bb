package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions.{col, collect_set, count => cnt, lit, udf}
import repro.rdf.TripleStore
import scala.collection.mutable

/** A factorized answer: for each query edge (and chord), the surviving
  * data-edge pairs, with columns named by the query variables they bind.
  *
  * For acyclic CQs this is the *ideal* answer graph (iAG): every pair
  * participates in at least one embedding. For cyclic CQs evaluated
  * without edge burnback it is a correct but possibly non-ideal AG
  * (paper Fig. 4).
  */
final case class AnswerGraph(cq: ConjunctiveQuery,
                             edges: Map[Int, DataFrame],
                             chords: Map[Int, DataFrame],
                             edgeSizes: Map[Int, Long],
                             nodeSizes: Map[String, Long],
                             rounds: Int) {
  /** Total answer-graph size: the factorized answer's tuple count
    * (sum over query edges; chords are auxiliary, not counted — they are
    * not part of the factorization, only of its maintenance).
    */
  def size: Long = edgeSizes.values.sum
}

/** Phase-1 evaluator (paper §3): edge extension in plan order with node
  * burnback, plus chord maintenance and optional edge burnback for
  * cyclic CQs.
  *
  * The paper's prototype keeps per-variable node tables in PostgreSQL
  * and cascades burnback in procedural SQL. The dataflow translation
  * here keeps the (small) node sets as driver-side sorted arrays
  * applied as membership filters over the Parquet predicate partitions,
  * and batches the cascade into semi-join-equivalent steps
  * (DESIGN.md §3.4):
  *
  *  1. *edge extension* — sequentially, in the Edgifier's cost-chosen
  *     order, each query edge's matching data edges are aggregated
  *     (one single-stage `collect_set` action) and its variables' node
  *     sets shrink to the endpoints actually seen;
  *  2. *burnback cascade* — fused passes in which every edge with a
  *     stale view re-reports its supported node sets in one Spark
  *     action and the driver intersects the reports per variable,
  *     iterated to a fixpoint. For acyclic CQs this computes the full
  *     semi-join reduction (Yannakakis); chords are re-materialized
  *     between passes for cyclic CQs.
  *
  * AG edge tables are *virtual*: a predicate scan filtered by the final
  * node sets (plus pair restrictions under edge burnback). That is the
  * factorized representation itself — for a tree CQ, a pair whose two
  * endpoints lie in the final (globally consistent) node sets always
  * extends to an embedding, so the filtered relation equals the fully
  * semi-join-reduced one.
  */
object AnswerGraphBuilder {

  /** Build the answer graph for `cq` following `plan`.
    *
    * @param chords       chordification from [[Triangulator]] (cyclic CQs)
    * @param edgeBurnback enable pair-level triangle-consistency pruning
    *                     (recovers the iAG for triangulated cycles; the
    *                     paper's experiments — and our benchmarks — run
    *                     without it)
    * @param maxRounds    fixpoint-iteration cap for cyclic CQs
    */
  def build(ts: TripleStore, cq: ConjunctiveQuery, plan: Plan,
            chords: Vector[Chord] = Vector.empty,
            edgeBurnback: Boolean = false,
            maxRounds: Int = 10): AnswerGraph = {
    require(plan.steps.map(_.edge.id).toSet == cq.edges.map(_.id).toSet,
      s"${cq.name}: plan must cover every query edge exactly once")

    // Driver-side node sets (the paper's node tables); absent = unbound.
    // Sorted arrays: compact to serialize into task closures, O(log n)
    // membership via binary search.
    val nodeSets = mutable.Map[String, Array[Long]]()
    // Pair-level restrictions, produced by edge burnback only.
    val restrict = mutable.Map[Int, DataFrame]()
    val chordDfs = mutable.Map[Int, DataFrame]()

    /** Filter `df` to rows whose `v` value is in `v`'s node set. */
    def pruneToNodes(df: DataFrame, vs: Seq[String]): DataFrame =
      vs.foldLeft(df) { (d, v) =>
        nodeSets.get(v).fold(d) { s =>
          val member = udf((x: Long) => java.util.Arrays.binarySearch(s, x) >= 0)
          d.filter(member(col(v)))
        }
      }

    /** The current (virtual) AG edge table. Column order (src, dst) is
      * canonical: downstream intersect/except resolve by position.
      */
    def edgeDf(e: QueryEdge): DataFrame = {
      val base = pruneToNodes(ts.byPred(e.pred).toDF(e.src, e.dst), e.vars)
      restrict.get(e.id).fold(base) { r =>
        base.join(r, Seq(e.src, e.dst), "left_semi").select(e.src, e.dst)
      }
    }

    def sizeOf(v: String): Int = nodeSets.get(v).map(_.length).getOrElse(-1)

    /** Per-relation snapshot of the node-set sizes it last saw. Node
      * sets only shrink, so unchanged sizes mean a re-pull is a no-op.
      */
    val lastSeen = mutable.Map[(Boolean, Int), Vector[Int]]()

    /** Edge extension / node burnback for one query edge: re-derive its
      * variables' node sets from its current edge table — one
      * single-stage action.
      */
    def pullEdge(e: QueryEdge): Unit = {
      val key = (false, e.id)
      val snap = Vector(sizeOf(e.src), sizeOf(e.dst))
      if (snap.forall(_ >= 0) && lastSeen.get(key).contains(snap)) return
      val row = edgeDf(e)
        .agg(collect_set(col(e.src)) as "su", collect_set(col(e.dst)) as "sv")
        .head()
      nodeSets(e.src) = row.getSeq[Long](0).toArray.sorted
      nodeSets(e.dst) = row.getSeq[Long](1).toArray.sorted
      lastSeen(key) = Vector(sizeOf(e.src), sizeOf(e.dst))
    }

    def sideDf(s: Side): Option[DataFrame] = s match {
      case EdgeSide(id, _, _)  => Some(edgeDf(cq.byId(id)))
      case ChordSide(id, _, _) => chordDfs.get(id)
    }

    /** One triangle's candidate pair set for chord `c`: join the two
      * sides through the apex, projected to the chord's variables.
      */
    def triangleJoin(c: Chord, t: Triangle): Option[DataFrame] =
      for { a <- sideDf(t.sideA); b <- sideDf(t.sideB) }
        yield a.join(b, Seq(t.apex)).select(c.u, c.v).distinct()

    /** (Re-)materialize chord `c` as the intersection of its triangles'
      * side joins (paper §4.I) and burn its endpoints back into the
      * node sets. Skipped when nothing it depends on has shrunk.
      */
    def pullChord(c: Chord, force: Boolean = false): Unit = {
      val key = (true, c.id)
      def snap() = (Vector(c.u, c.v) ++ c.triangles.map(_.apex)).map(sizeOf)
      if (!force && chordDfs.contains(c.id) && lastSeen.get(key).contains(snap())) return
      val parts = c.triangles.flatMap(t => triangleJoin(c, t))
      require(parts.nonEmpty, s"chord ${c.id} (${c.u},${c.v}) has no computable triangle")
      val df = parts.reduce(_ intersect _).localCheckpoint()
      chordDfs(c.id) = df
      val row = df.agg(collect_set(col(c.u)) as "su", collect_set(col(c.v)) as "sv").head()
      nodeSets(c.u) = row.getSeq[Long](0).toArray.sorted
      nodeSets(c.v) = row.getSeq[Long](1).toArray.sorted
      lastSeen(key) = snap()
    }

    /** Pair-level pruning (edge burnback): keep only side pairs that
      * close some triangle instance consistent with the chord.
      */
    def triangleRefine(c: Chord, t: Triangle): Unit =
      (sideDf(t.sideA), sideDf(t.sideB)) match {
        case (Some(a), Some(b)) =>
          val tj = a.join(b, Seq(t.apex)).join(chordDfs(c.id), Seq(c.u, c.v))
            .localCheckpoint()
          def upd(s: Side): Unit = s match {
            case EdgeSide(id, _, _) =>
              val qe = cq.byId(id)
              restrict(id) = tj.select(qe.src, qe.dst).distinct()
            case ChordSide(id, _, _) =>
              val ch = chords.find(_.id == id).get
              chordDfs(id) = tj.select(ch.u, ch.v).distinct()
          }
          upd(t.sideA); upd(t.sideB)
          chordDfs(c.id) = tj.select(c.u, c.v).distinct()
        case _ => ()
      }

    // ---- Edge extension (top-down): bind variables one plan step at a
    // time; nodes that fail to extend drop out as we go (the batched
    // form of interleaved node burnback). Sequential on purpose: this is
    // the cost-planned edge-extension order from the Edgifier.
    plan.steps.foreach(s => pullEdge(s.edge))
    // Initial chord materialization in id order (each chord has at least
    // one triangle whose sides are already available).
    chords.sortBy(_.id).foreach(c => pullChord(c, force = true))

    /** Count every relation in one Spark action (the |AG| statistics
      * and the edge-burnback fixpoint test).
      */
    def countAll(): Map[(Boolean, Int), Long] = {
      val parts =
        cq.edges.map(e => edgeDf(e).groupBy().agg(cnt(lit(1)) as "n")
          .select(lit(false) as "c", lit(e.id) as "i", col("n"))) ++
        chords.map(c => chordDfs(c.id).groupBy().agg(cnt(lit(1)) as "n")
          .select(lit(true) as "c", lit(c.id) as "i", col("n")))
      parts.reduce(_ unionByName _)
        .collect()
        .map(row => (row.getBoolean(0), row.getInt(1)) -> row.getLong(2))
        .toMap
    }

    /** Merge two sorted arrays by intersection. */
    def intersectSorted(a: Array[Long], b: Array[Long]): Array[Long] = {
      val out = Array.newBuilder[Long]
      var i = 0; var j = 0
      while (i < a.length && j < b.length) {
        if (a(i) == b(j)) { out += a(i); i += 1; j += 1 }
        else if (a(i) < b(j)) i += 1
        else j += 1
      }
      out.result()
    }

    /** One fused node-burnback pass (the cascade): every edge reports
      * the node sets it can still support in a single Spark action (all
      * predicate scans run in parallel); the driver intersects the
      * reports per variable. Returns whether any node set shrank.
      * Iterated to a fixpoint this computes the same result as a
      * relation-at-a-time semi-join program — a full reduction for
      * acyclic CQs — while costing one action per pass instead of one
      * per relation.
      */
    def burnbackPass(): Boolean = {
      // Only edges that saw a node set shrink since their last
      // aggregation can contribute new pruning; the rest are skipped
      // (and a pass with nothing stale costs no Spark action at all).
      val stale = cq.edges.filter { e =>
        !lastSeen.get((false, e.id)).contains(Vector(sizeOf(e.src), sizeOf(e.dst)))
      }
      if (stale.isEmpty) return false
      val parts = stale.map { e =>
        edgeDf(e)
          .agg(collect_set(col(e.src)) as "su", collect_set(col(e.dst)) as "sv")
          .select(lit(e.id) as "id", col("su"), col("sv"))
      }
      val rows = parts.reduce(_ unionByName _).collect()
      val contrib = mutable.Map[String, Array[Long]]()
      for (row <- rows) {
        val e = cq.byId(row.getInt(0))
        for ((v, idx) <- Seq(e.src -> 1, e.dst -> 2)) {
          val got = row.getSeq[Long](idx).toArray.sorted
          contrib(v) = contrib.get(v).fold(got)(intersectSorted(_, got))
        }
      }
      var changed = false
      for ((v, arr) <- contrib) {
        if (sizeOf(v) != arr.length) changed = true
        nodeSets(v) = arr
      }
      for (e <- stale) lastSeen((false, e.id)) = Vector(sizeOf(e.src), sizeOf(e.dst))
      changed
    }

    /** Re-materialize stale chords; returns whether any changed. */
    def refreshChords(): Boolean = {
      val before = cq.vars.map(sizeOf)
      chords.sortBy(_.id).foreach(c => pullChord(c))
      before != cq.vars.map(sizeOf)
    }

    // ---- Node burnback cascade to fixpoint (with chord maintenance for
    // cyclic CQs). Stability of the node sets implies stability of the
    // (virtual, set-filtered) edge tables, so no tuple counting is
    // needed to detect the fixpoint.
    var rounds = 0
    var changed = true
    while (changed && rounds < maxRounds) {
      changed = burnbackPass()
      if (chords.nonEmpty && refreshChords()) changed = true
      rounds += 1
    }

    var sizes: Map[(Boolean, Int), Long] = null
    if (edgeBurnback && chords.nonEmpty) {
      // Pair-level refinement changes edge content without changing node
      // sets, so this fixpoint is detected on relation counts.
      var prev: Map[(Boolean, Int), Long] = null
      var stable = false
      var r = 0
      while (!stable && r < maxRounds) {
        for (c <- chords; t <- c.triangles) triangleRefine(c, t)
        lastSeen.clear()
        var ch = true
        while (ch) { ch = burnbackPass(); if (refreshChords()) ch = true }
        val cur = countAll()
        stable = cur == prev
        prev = cur
        r += 1
      }
      sizes = prev
    } else {
      sizes = countAll()
    }

    AnswerGraph(
      cq,
      cq.edges.map(e => e.id -> edgeDf(e)).toMap,
      chordDfs.toMap,
      sizes.collect { case ((false, id), n) => id -> n },
      cq.vars.map(v => v -> nodeSets.get(v).map(_.length.toLong).getOrElse(0L)).toMap,
      rounds,
    )
  }
}
