package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.rdf.{TripleStore, YagoLite}

/** Handcrafted graphs from the paper's figures plus cached YagoLite
  * samples, shared across suites (one JVM per test run).
  */
object Fixtures {

  /** Paper Fig. 1: the chain query `?w -A-> ?x -B-> ?y -C-> ?z`. */
  val chainCq: ConjunctiveQuery = ConjunctiveQuery("chain", Vector(
    QueryEdge(0, "w", "A", "x"),
    QueryEdge(1, "x", "B", "y"),
    QueryEdge(2, "y", "C", "z"),
  ))

  /** Fig.-1-style data: A-edges fan in to node 10, C-edges fan out of
    * node 20; plus pruning bait — a dangling A edge (4 -A-> 11, no B
    * from 11) and an unreachable C edge (21 -C-> 32).
    * Embeddings: (1|2|3, 10, 20, 31|33) = 6. iAG: 3 A + 1 B + 2 C = 6
    * edges vs 8 data edges.
    */
  def chainData(spark: SparkSession): TripleStore = TripleStore(spark, Seq(
    (1L, "A", 10L), (2L, "A", 10L), (3L, "A", 10L), (4L, "A", 11L),
    (10L, "B", 20L),
    (20L, "C", 31L), (20L, "C", 33L), (21L, "C", 32L),
  ))

  /** The diamond query `a -P-> b -R-> d`, `a -Q-> c -S-> d` (4-cycle). */
  val diamondCq: ConjunctiveQuery = ConjunctiveQuery("diamond", Vector(
    QueryEdge(0, "a", "P", "b"),
    QueryEdge(1, "a", "Q", "c"),
    QueryEdge(2, "b", "R", "d"),
    QueryEdge(3, "c", "S", "d"),
  ))

  /** Paper Fig. 4 analogue: two clean embeddings (1,2,3,4) and
    * (5,6,7,8) plus the spurious edge P(1,6): every endpoint node is
    * live (so node burnback keeps it) yet no embedding uses it —
    * only edge burnback can remove it.
    */
  def diamondData(spark: SparkSession): TripleStore = TripleStore(spark, Seq(
    (1L, "P", 2L), (1L, "Q", 3L), (2L, "R", 4L), (3L, "S", 4L),
    (5L, "P", 6L), (5L, "Q", 7L), (6L, "R", 8L), (7L, "S", 8L),
    (1L, "P", 6L), // spurious
  ))

  /** Embeddings of [[diamondCq]] over [[diamondData]]. */
  val diamondEmbeddings: Set[(Long, Long, Long, Long)] =
    Set((1L, 2L, 3L, 4L), (5L, 6L, 7L, 8L))

  private val cache = scala.collection.mutable.Map[Double, DataFrame]()

  /** YagoLite triples at `sf`, generated once per JVM and cached. */
  def yago(spark: SparkSession, sf: Double): TripleStore = synchronized {
    val df = cache.getOrElseUpdate(sf, {
      val d = YagoLite.triples(spark, sf).cache()
      d.count()
      d
    })
    TripleStore(df)
  }

  private val catCache = scala.collection.mutable.Map[Double, Catalog]()

  /** Catalog over [[yago]] at `sf`, cached. */
  def yagoCatalog(spark: SparkSession, sf: Double): Catalog = synchronized {
    catCache.getOrElseUpdate(sf, Catalog.build(yago(spark, sf).triples))
  }
}
