package repro.core

/** One edge of a conjunctive query's query graph: the pattern
  * `?src -pred-> ?dst`. `id` is unique within the query.
  */
final case class QueryEdge(id: Int, src: String, pred: String, dst: String) {
  require(src != dst, s"self-loop query edges are not supported: $this")
  /** The two binding variables this edge constrains. */
  def vars: Seq[String] = Seq(src, dst)
  /** Whether the edge touches variable `v`. */
  def touches(v: String): Boolean = src == v || dst == v
  /** The variable opposite `v` on this edge. */
  def other(v: String): String = { require(touches(v)); if (src == v) dst else src }
  /** The triple-pattern end (`'s'` or `'o'`) that `v` occupies. */
  def end(v: String): Char = { require(touches(v)); if (src == v) 's' else 'o' }
}

/** A SPARQL conjunctive query as a query graph: binding variables are
  * nodes, triple patterns are directed labeled edges. The query graph
  * must be connected (Cartesian-product queries are out of the paper's
  * scope).
  */
final case class ConjunctiveQuery(name: String, edges: Vector[QueryEdge]) {
  require(edges.nonEmpty, s"$name: a CQ needs at least one edge")
  require(edges.map(_.id).distinct.size == edges.size, s"$name: duplicate edge ids")

  /** All binding variables, in first-appearance order. */
  lazy val vars: Vector[String] = edges.flatMap(_.vars).distinct

  /** Edge lookup by id. */
  lazy val byId: Map[Int, QueryEdge] = edges.map(e => e.id -> e).toMap

  /** Edges incident to a variable. */
  lazy val incident: Map[String, Vector[QueryEdge]] =
    vars.map(v => v -> edges.filter(_.touches(v))).toMap

  require(isConnected(edges.map(_.id).toSet), s"$name: query graph must be connected")

  /** Whether the undirected query (multi)graph has a cycle. Detected by
    * union–find: an edge whose endpoints are already connected closes a
    * cycle. Two parallel edges between the same variable pair count as a
    * (length-2) cycle, matching the paper's factorization caveat.
    */
  lazy val isCyclic: Boolean = {
    val parent = scala.collection.mutable.Map(vars.map(v => v -> v): _*)
    def find(v: String): String = { var r = v; while (parent(r) != r) r = parent(r); r }
    edges.exists { e =>
      val (a, b) = (find(e.src), find(e.dst))
      if (a == b) true else { parent(a) = b; false }
    }
  }

  /** Whether the edge-id subset induces a connected subgraph. */
  def isConnected(ids: Set[Int]): Boolean = {
    if (ids.isEmpty) return true
    val sub = edges.filter(e => ids.contains(e.id))
    val seen = scala.collection.mutable.Set(sub.head.src)
    var grown = true
    while (grown) {
      grown = false
      for (e <- sub if seen.contains(e.src) ^ seen.contains(e.dst)) {
        seen += e.src; seen += e.dst; grown = true
      }
      // An edge with both endpoints unseen may connect later; loop again
      // whenever we grew.
    }
    sub.forall(e => seen.contains(e.src) && seen.contains(e.dst))
  }

  /** Variables bound after materializing the edge-id subset. */
  def boundVars(ids: Set[Int]): Set[String] =
    edges.filter(e => ids.contains(e.id)).flatMap(_.vars).toSet

  /** Edges not in `ids` that share a variable with it (the legal next
    * plan steps for a connected left-deep plan).
    */
  def frontier(ids: Set[Int]): Vector[QueryEdge] = {
    val bound = boundVars(ids)
    edges.filter(e => !ids.contains(e.id) && e.vars.exists(bound.contains))
  }

  /** One simple cycle per independent cycle of the query graph, each as
    * the ordered list of variables around the cycle. Computed from a DFS
    * spanning tree: every non-tree edge closes one fundamental cycle.
    * Acyclic queries yield no cycles.
    */
  lazy val fundamentalCycles: Vector[Vector[String]] = {
    val parentVar  = scala.collection.mutable.Map[String, String]()
    val parentEdge = scala.collection.mutable.Map[String, Int]()
    val visited    = scala.collection.mutable.Set[String]()
    val treeEdges  = scala.collection.mutable.Set[Int]()
    def dfs(v: String): Unit = {
      visited += v
      for (e <- incident(v) if !treeEdges.contains(e.id)) {
        val w = e.other(v)
        if (!visited.contains(w)) {
          treeEdges += e.id; parentVar(w) = v; parentEdge(w) = e.id
          dfs(w)
        }
      }
    }
    dfs(vars.head)
    val nonTree = edges.filterNot(e => treeEdges.contains(e.id))
    nonTree.map { e =>
      // Path from src to dst through the tree: climb both to the root,
      // then splice at the lowest common ancestor.
      def pathToRoot(v: String): Vector[String] = {
        val buf = Vector.newBuilder[String]
        var cur = v
        buf += cur
        while (parentVar.contains(cur)) { cur = parentVar(cur); buf += cur }
        buf.result()
      }
      val pa = pathToRoot(e.src)
      val pb = pathToRoot(e.dst)
      val common = pa.toSet.intersect(pb.toSet)
      val lca = pa.find(common.contains).get
      val up   = pa.takeWhile(_ != lca) :+ lca
      val down = pb.takeWhile(_ != lca).reverse
      up ++ down
    }
  }
}
