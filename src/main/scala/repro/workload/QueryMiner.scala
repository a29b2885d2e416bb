package repro.workload

import repro.core.{Catalog, ConjunctiveQuery, QueryEdge}

/** The paper's query miner (§5): instantiates query templates — edge
  * shapes with placeholders for edge labels — into valid, non-empty
  * conjunctive queries over a dataset.
  *
  * Validity is checked structurally (each slot filled, graph connected);
  * non-emptiness is pre-screened with the catalog: a query can only be
  * non-empty if every adjacent label pair shares at least one node at
  * the joining ends (2-gram overlap > 0) and every label exists (1-gram
  * count > 0). This is a necessary condition, exactly the pruning a
  * miner needs to avoid evaluating hopeless candidates; callers confirm
  * survivors by evaluation (the paper mined 218,014 snowflake and
  * 18,743 diamond queries this way, then picked 5 + 5).
  */
object QueryMiner {

  /** A template edge: fixed endpoints, label slot index (into the
    * candidate lists) or a fixed label.
    */
  final case class TemplateEdge(src: String, slot: Either[Int, String], dst: String)

  /** Instantiate `template` with every combination from `candidates`
    * (one candidate list per slot), keeping instantiations that pass the
    * catalog screen.
    */
  def mine(name: String, template: Vector[TemplateEdge],
           candidates: Vector[Seq[String]], cat: Catalog): Vector[ConjunctiveQuery] = {
    val combos = candidates.foldLeft(Vector(Vector.empty[String])) { (acc, cands) =>
      acc.flatMap(prefix => cands.map(prefix :+ _))
    }
    combos.zipWithIndex.flatMap { case (labels, i) =>
      val edges = template.zipWithIndex.map { case (t, j) =>
        val pred = t.slot.fold(labels(_), identity)
        QueryEdge(j, t.src, pred, t.dst)
      }
      val cq = ConjunctiveQuery(s"$name-$i", edges)
      if (screen(cq, cat)) Some(cq) else None
    }
  }

  /** Catalog-based necessary condition for non-emptiness. */
  def screen(cq: ConjunctiveQuery, cat: Catalog): Boolean = {
    val labelsExist = cq.edges.forall(e => cat.stats(e.pred).count > 0)
    val joinsOverlap = cq.vars.forall { v =>
      val inc = cq.incident(v)
      inc.combinations(2).forall { pair =>
        val (e1, e2) = (pair(0), pair(1))
        cat.overlap(e1.pred, e1.end(v), e2.pred, e2.end(v)) > 0
      }
    }
    labelsExist && joinsOverlap
  }
}
