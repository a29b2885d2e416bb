package repro.rdf

import org.apache.spark.sql.{Column, DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types.LongType

/** Synthetic stand-in for YAGO2s (DESIGN.md §3.1, §4).
  *
  * The paper benchmarks on YAGO2s: 242M triples, 104 predicates. This
  * generator reproduces, at a configurable scale factor, the properties
  * the answer-graph evaluation is sensitive to:
  *
  *  - the predicate vocabulary used by the paper's Table-1 queries;
  *  - typed node domains (persons, movies, cities, countries, ...),
  *    so query templates type-check as they would on YAGO;
  *  - heavy-tailed degree distributions on hub endpoints (popular
  *    movies, much-linked countries), which create the fan-in/fan-out
  *    multiplicity that makes |embeddings| >> |answer graph|;
  *  - functional attribute predicates (a movie has one creation date,
  *    one duration).
  *
  * SF=1 is ~1.5M triples. Generation is deterministic in (sf, seed)
  * within a session.
  */
object YagoLite {

  /** A contiguous node-ID range for one entity type. Domains are
    * disjoint so a node's type is recoverable from its ID.
    */
  final case class Domain(name: String, base: Long, n: Long) {
    def contains(id: Long): Boolean = id >= base && id < base + n
  }

  /** Entity-domain sizes at scale factor `sf` (counts floor at 1). */
  final case class Domains(sf: Double) {
    private def sz(perSf: Long): Long = math.max(1L, (perSf * sf).toLong)
    val persons: Domain   = Domain("person",   0L,             sz(100000))
    val movies: Domain    = Domain("movie",    1000000000L,    sz(20000))
    val cities: Domain    = Domain("city",     2000000000L,    sz(2000))
    val countries: Domain = Domain("country",  3000000000L,    sz(200))
    val orgs: Domain      = Domain("org",      4000000000L,    sz(5000))
    val events: Domain    = Domain("event",    5000000000L,    sz(10000))
    val dates: Domain     = Domain("date",     6000000000L,    sz(3000))
    val durations: Domain = Domain("duration", 7000000000L,    sz(300))
    val all: Seq[Domain] =
      Seq(persons, movies, cities, countries, orgs, events, dates, durations)
  }

  /** Triple counts per predicate at SF=1 (before de-duplication). */
  private val CountsPerSf: Map[String, Long] = Map(
    "actedIn"       -> 160000L,
    "created"       ->  30000L,
    "influences"    -> 150000L,
    "hasChild"      ->  80000L,
    "isMarriedTo"   ->  80000L,
    "diedIn"        ->  80000L,
    "wasBornIn"     ->  90000L,
    "livesIn"       ->  80000L,
    "isCitizenOf"   ->  95000L,
    "graduatedFrom" ->  70000L,
    "owns"          ->  70000L,
    "wasBornOnDate" ->  90000L,
    "happenedIn"    ->  15000L,
    "linksTo"       -> 500000L,
  )

  /** All predicates emitted by [[triples]], including the functional and
    * composite-domain ones.
    */
  val Predicates: Seq[String] =
    (CountsPerSf.keySet ++ Set("wasCreatedOnDate", "hasDuration", "isLocatedIn")).toSeq.sorted

  private def n(pred: String, sf: Double): Long =
    math.max(1L, (CountsPerSf(pred) * sf).toLong)

  /** A per-salt multiplier coprime to `n` (so the affine map below is a
    * bijection on [0, n)). Distinct salts give distinct multipliers:
    * with a shared multiplier, two pools over the same domain intersect
    * as intervals (all or nothing) instead of pseudo-independently.
    */
  private def coprimeMultiplier(n: Long, salt: Long): Long = {
    var m = 2654435761L + 2L * (math.abs(salt) % 1000003L) + 1L
    while (BigInt(m).gcd(BigInt(n)) != BigInt(1)) m += 1
    m
  }

  /** Power-skewed draw from a per-predicate *pool* of the domain.
    *
    * Only a `poolFrac` fraction of the domain's entities carries this
    * predicate at all (on YAGO most people have no `diedIn`, some have
    * several). The draw lands in `[0, poolN)`, skewed toward the pool's
    * hubs (`gamma` = 1 uniform, larger = hub-heavier), then a
    * per-predicate affine permutation scatters the pool across the
    * domain. Consequences mirror YAGO: different predicates select
    * near-independent entity subsets (conjunctions are selective — the
    * ideal answer graph stays small) while entities inside a pool carry
    * several edges (multiplicity — the embedding count stays large).
    */
  private def pooled(r: Column, dom: Domain, gamma: Double,
                     poolFrac: Double, salt: Long): Column = {
    val poolN = math.max(1L, (dom.n * poolFrac).toLong)
    val a = coprimeMultiplier(dom.n, salt)
    val b = math.abs(salt * 1103515245L + 12345L) % dom.n
    val draw = least(lit(poolN - 1), (pow(r, gamma) * poolN).cast(LongType))
    (lit(dom.base) + pmod(draw * lit(a) + lit(b), lit(dom.n))).cast(LongType)
  }

  /** One pooled-skewed random edge table `s -pred-> o` with `rows`
    * draws, de-duplicated (RDF triples are a set).
    */
  private def randEdges(spark: SparkSession, pred: String, rows: Long,
                        src: Domain, sGamma: Double, sPool: Double,
                        dst: Domain, oGamma: Double, oPool: Double,
                        seed: Long): DataFrame =
    spark.range(rows).select(
      pooled(rand(seed), src, sGamma, sPool, (pred + "s").hashCode.toLong)     as "s",
      lit(pred)                                                                as "p",
      pooled(rand(seed + 1), dst, oGamma, oPool, (pred + "o").hashCode.toLong) as "o",
    ).distinct()

  /** Functional attribute `every node of src has exactly one dst`,
    * assigned by a deterministic hash — no randomness, no duplicates.
    */
  private def functionalEdges(spark: SparkSession, pred: String,
                              src: Domain, dst: Domain, salt: Long): DataFrame =
    spark.range(src.n).select(
      (col("id") + src.base) as "s",
      lit(pred) as "p",
      (lit(dst.base) + pmod(col("id") * lit(2654435761L) + lit(salt), lit(dst.n)))
        .cast(LongType) as "o",
    )

  /** The full synthetic YAGO-lite triple set at scale factor `sf`. */
  def triples(spark: SparkSession, sf: Double = 0.01, seed: Long = 42): DataFrame = {
    val d = Domains(sf)
    def c(p: String) = n(p, sf)
    val parts = Seq(
      // Person->movie: ~1/3 of persons are actors; movie-side skew makes
      // blockbuster hubs with many actors (the snowflake fan-in).
      randEdges(spark, "actedIn",     c("actedIn"),     d.persons, 1.4, 0.35, d.movies, 2.0, 1.0, seed + 10),
      randEdges(spark, "created",     c("created"),     d.persons, 1.5, 0.15, d.movies, 1.2, 1.0, seed + 20),
      // Person->person web: influencer hubs inside their pools.
      randEdges(spark, "influences",  c("influences"),  d.persons, 1.4, 0.30, d.persons, 1.8, 0.50, seed + 30),
      randEdges(spark, "hasChild",    c("hasChild"),    d.persons, 1.3, 0.30, d.persons, 1.2, 0.50, seed + 40),
      randEdges(spark, "isMarriedTo", c("isMarriedTo"), d.persons, 1.2, 0.25, d.persons, 1.2, 0.50, seed + 50),
      // Person attributes: each carried by a scattered minority pool.
      randEdges(spark, "diedIn",      c("diedIn"),      d.persons, 1.3, 0.25, d.cities, 1.8, 1.0, seed + 60),
      randEdges(spark, "wasBornIn",   c("wasBornIn"),   d.persons, 1.3, 0.35, d.cities, 1.8, 1.0, seed + 70),
      randEdges(spark, "livesIn",     c("livesIn"),     d.persons, 1.3, 0.30, d.cities, 1.8, 1.0, seed + 80),
      randEdges(spark, "isCitizenOf", c("isCitizenOf"), d.persons, 1.3, 0.35, d.countries, 1.8, 1.0, seed + 90),
      randEdges(spark, "graduatedFrom", c("graduatedFrom"), d.persons, 1.3, 0.25, d.orgs, 1.8, 1.0, seed + 100),
      randEdges(spark, "owns",        c("owns"),        d.persons, 1.4, 0.15, d.orgs, 1.6, 1.0, seed + 110),
      randEdges(spark, "wasBornOnDate", c("wasBornOnDate"), d.persons, 1.2, 0.40, d.dates, 1.2, 1.0, seed + 120),
      randEdges(spark, "happenedIn",  c("happenedIn"),  d.events, 1.2, 0.50, d.cities, 1.8, 1.0, seed + 130),
      // Movie functional attributes.
      functionalEdges(spark, "wasCreatedOnDate", d.movies, d.dates, 7L),
      functionalEdges(spark, "hasDuration",      d.movies, d.durations, 11L),
      // Geography: every city and org sits in one country.
      functionalEdges(spark, "isLocatedIn", d.cities, d.countries, 13L),
      functionalEdges(spark, "isLocatedIn", d.orgs,   d.countries, 17L),
      // The heavy wiki-link predicate over cities/countries/events/orgs.
      linksTo(spark, sf, seed, d),
    )
    parts.reduce(_ unionByName _)
  }

  /** `linksTo` mixes endpoint-domain combinations to mimic YAGO's
    * untyped wiki-link edges. The bulk targets the larger city/event
    * domains (so the predicate stays the heaviest under RDF set
    * semantics even at small scale factors, as page links are on YAGO);
    * the country-targeting combos the diamond queries join on are kept.
    */
  private def linksTo(spark: SparkSession, sf: Double, seed: Long, d: Domains): DataFrame = {
    val total = n("linksTo", sf)
    Seq(
      randEdges(spark, "linksTo", total * 2 / 10, d.cities,    1.2, 0.8, d.countries, 2.0, 1.0, seed + 200),
      randEdges(spark, "linksTo", total * 1 / 10, d.countries, 1.4, 1.0, d.countries, 1.6, 1.0, seed + 210),
      randEdges(spark, "linksTo", total * 2 / 10, d.events,    1.2, 0.8, d.countries, 2.0, 1.0, seed + 220),
      randEdges(spark, "linksTo", total * 25 / 100, d.events,  1.2, 0.8, d.cities, 1.8, 1.0, seed + 230),
      randEdges(spark, "linksTo", total * 25 / 100, d.orgs,    1.2, 0.8, d.cities, 1.8, 1.0, seed + 240),
    ).reduce(_ unionByName _)
  }
}
