package repro.lake

import org.apache.spark.sql.{DataFrame, SparkSession}
import scala.collection.mutable
import scala.util.Random

import repro.kb.World
import repro.lake.LakeSchema.TableData

/** Synthetic benchmark lakes emulating the paper's TUS, SMALL and LARGE
  * benchmarks (Sec. 8.1), built from the synthetic world.
  *
  * Construction follows the TUS recipe the paper reuses: each *domain* is a
  * master table (a subject column + property columns tied to the subject by
  * specific KB predicates, or by KB-free local vocabularies for
  * zero-coverage domains, plus numeric/date noise), partitioned into many
  * overlapping horizontal samples with random vertical projections. Ground
  * truth: tables are unionable iff they come from the same domain (same
  * subject + relationships, the paper's relabeled notion).
  *
  * Two knobs reproduce the paper's phenomena:
  *  - **trap domains** share column value types but not relationships (people
  *    *bornIn* city vs parks *locatedIn* city — Ex. 1), which column-only
  *    methods cannot tell apart;
  *  - **KB coverage** per domain: a fraction of entity labels is consistently
  *    renamed to out-of-KB variants (and some domains use fully synthetic
  *    vocabularies), so the synthesized KB must compensate (Sec. 8.3).
  */
object BenchmarkGen {

  // ------------------------------------------------------------ column specs

  sealed trait ColGen { def name: String }
  /** The subject column (always retained; the query intent column). */
  final case class SubjectCol(name: String) extends ColGen
  /** Object label of a world fact `predicate(subject)`. */
  final case class PropCol(name: String, predicate: String) extends ColGen
  /** Object label of a 2-hop chain `pred2(pred1(subject))`. */
  final case class ChainCol(name: String, pred1: String, pred2: String) extends ColGen
  /** KB-free local value, functionally dependent on the subject. */
  final case class LocalPropCol(name: String, vocab: Int) extends ColGen
  /** Uniform numeric noise column. */
  final case class NumCol(name: String, lo: Double, hi: Double) extends ColGen
  /** Year column (string-typed digits; not a KB label). */
  final case class YearCol(name: String) extends ColGen

  /** @param subjectType  world type of subject entities; None = fully
    *                     synthetic, zero-KB-coverage subject vocabulary
    * @param kbCoverage   fraction of entity labels kept verbatim; the rest are
    *                     consistently renamed to out-of-KB variants
    * @param nPartitions  number of lake tables carved from the domain
    *                     (distributed across its sources)
    * @param isQuery      whether query tables are drawn from this domain
    * @param nameNoise    probability a partition column gets a generic name
    * @param nSources     independent masters per domain, over *disjoint*
    *                     subject slices: cross-source tables share
    *                     relationships but no subject values — the real-lake
    *                     property that makes ground truth invisible to
    *                     column-overlap methods (and to the synthesized KB
    *                     alone) while KB annotation still finds it. Queries
    *                     come from source 0.
    */
  final case class DomainSpec(
      id: String,
      subjectType: Option[String],
      cols: Seq[ColGen],
      nSubjects: Int,
      nPartitions: Int,
      kbCoverage: Double,
      isQuery: Boolean,
      nameNoise: Double = 0.25,
      nSources: Int = 1) {
    require(cols.head.isInstanceOf[SubjectCol], s"first column of $id must be the subject")
    require(nSources >= 1 && nSources <= nPartitions, s"bad nSources for $id")
  }

  final case class QuerySpec(tableId: String, intentCol: Int)

  final case class Benchmark(
      name: String,
      k: Int,
      lakeCells: DataFrame,
      queryCells: DataFrame,
      queries: Seq[QuerySpec],
      groundTruth: Map[String, Set[String]],
      nLakeTables: Int, nLakeColumns: Long, nLakeRows: Long,
      nQueryTables: Int, nQueryColumns: Long, nQueryRows: Long)

  // ------------------------------------------------------- value generation

  /** Syllables disjoint (by the letters x/j) from the world's, so local
    * vocabularies never collide with KB labels.
    */
  private val localSyllables =
    Array("xa", "ju", "xi", "jo", "xem", "jur", "xon", "xu", "jap", "jix")

  private def localWord(rng: Random, n: Int): String =
    (1 to n).map(_ => localSyllables(rng.nextInt(localSyllables.length))).mkString

  private def localVocab(rng: Random, size: Int): Vector[String] = {
    val used = mutable.HashSet[String]()
    Vector.fill(size) {
      var w = localWord(rng, 2 + rng.nextInt(2))
      while (used.contains(w)) w = w + localSyllables(rng.nextInt(localSyllables.length))
      used += w
      w
    }
  }

  /** Master table of a domain: one row per subject, fully populated. */
  private final case class Master(
      spec: DomainSpec,
      colNames: Seq[String],
      isString: Seq[Boolean],
      rows: Vector[Vector[String]])

  /** Per-subject-type cursor so domains over the same type get distinct
    * (wrapping) entity slices.
    */
  private def buildMaster(world: World, spec: DomainSpec,
                          cursor: mutable.Map[String, Int], rng: Random): Master = {
    // Subject labels (+ entity ids for fact lookups; -1 for synthetic).
    // Slices are disjoint: each master (a domain's next source, or another
    // domain over the same type) describes different entities. Cross-source
    // ground truth therefore shares *relationships* but not subject values —
    // reachable through semantic annotation, invisible to value overlap.
    val subjects: Vector[(Long, String)] = spec.subjectType match {
      case Some(t) =>
        val pool = world.byTypeTransitive(t)
        val start = cursor.getOrElse(t, 0)
        cursor(t) = start + spec.nSubjects
        Vector.tabulate(spec.nSubjects) { i =>
          val e = pool((start + i) % pool.length)
          (e.id, e.label)
        }
      case None =>
        localVocab(rng, spec.nSubjects).map(l => (-1L, l))
    }

    // Consistent out-of-KB renaming for (1 - kbCoverage) of this domain's
    // entity labels. The rename map is keyed by entity id so the same entity
    // is renamed identically everywhere in the domain (co-occurrence and FDs
    // survive; KB lookups do not).
    val rename = mutable.Map[Long, String]()
    def covered(id: Long, label: String): String =
      if (id < 0) label
      else rename.getOrElse(id, {
        val out =
          if (rng.nextDouble() < spec.kbCoverage) label
          else label + " " + localWord(rng, 1)
        rename(id) = out
        out
      })

    val localCols: Map[String, Vector[String]] = spec.cols.collect {
      case LocalPropCol(name, vocab) => name -> localVocab(rng, vocab)
    }.toMap

    val rows = subjects.map { case (sid, slabel) =>
      spec.cols.toVector.map {
        case SubjectCol(_) => covered(sid, slabel)
        case PropCol(_, pred) =>
          world.objOf(pred, sid)
            .map(o => covered(o, world.entitiesById(o).label)).orNull
        case ChainCol(_, p1, p2) =>
          (for {
            o1 <- world.objOf(p1, sid)
            o2 <- world.objOf(p2, o1)
          } yield covered(o2, world.entitiesById(o2).label)).orNull
        case LocalPropCol(name, vocab) =>
          // functional on the subject: deterministic in (subject, column)
          localCols(name)(math.abs((slabel + name).hashCode) % vocab)
        case NumCol(_, lo, hi) => f"${lo + rng.nextDouble() * (hi - lo)}%.2f"
        case YearCol(_) => (1990 + rng.nextInt(30)).toString
      }
    }
    Master(spec, spec.cols.map(_.name),
           spec.cols.map { case _: NumCol => false; case _ => true }, rows)
  }

  /** Column-name variants a partition may use instead of the master name. */
  private def colNameVariant(base: String, idx: Int, noise: Double, rng: Random): String = {
    if (rng.nextDouble() < noise) s"column_$idx"
    else rng.nextInt(3) match {
      case 0 => base
      case 1 => base.replace("_", " ")
      case _ => s"${base}_1"
    }
  }

  /** Carves `spec.nPartitions` lake tables out of the master: overlapping
    * horizontal samples × vertical projections (subject always kept, plus at
    * least one string property column). The first `fullCopies` partitions keep
    * every column — query tables are chosen among them so the query semantic
    * tree has all its relationships.
    */
  private def partitions(master: Master, nParts: Int, fullCopies: Int, rng: Random,
                         rowFrac: Double, colKeepProb: Double,
                         tablePrefix: String): Seq[(TableData, Int)] = {
    val spec = master.spec
    val nCols = master.colNames.length
    // Every partition must keep a *semantic* string property (not just a year
    // column), so each ground-truth table carries at least one relationship.
    val stringPropIdx = (1 until nCols).filter { i =>
      master.isString(i) && !spec.cols(i).isInstanceOf[YearCol]
    }.toVector

    (0 until nParts).map { p =>
      val keep: Vector[Int] =
        if (p < fullCopies) (0 until nCols).toVector
        else {
          var chosen = (1 until nCols).filter(_ => rng.nextDouble() < colKeepProb).toVector
          if (!chosen.exists(stringPropIdx.contains))
            chosen = (chosen :+ stringPropIdx(rng.nextInt(stringPropIdx.length))).sorted
          0 +: chosen.distinct.sorted
        }
      val rows = master.rows.filter(_ => rng.nextDouble() < rowFrac)
        .map(r => keep.map(r(_)).toSeq)
      val names = keep.zipWithIndex.map { case (c, i) =>
        colNameVariant(master.colNames(c), i, spec.nameNoise, rng)
      }
      val td = TableData(s"${tablePrefix}__$p", names.map(_.toString),
                         keep.map(master.isString(_)), rows)
      (td, keep.indexOf(0)) // subject position (always 0 here, kept explicit)
    }
  }

  // ------------------------------------------------------------- generation

  /** Generates a benchmark from domain specs.
    *
    * @param queriesPerDomain how many query tables per query domain
    * @param rowFrac          horizontal sampling rate per partition
    * @param colKeepProb      probability a non-query partition keeps each
    *                         property column — low values make the true
    *                         answers *fragments*, which is what defeats
    *                         column-only methods in the paper's lakes
    */
  def generate(spark: SparkSession, world: World, name: String, k: Int,
               specs: Seq[DomainSpec], queriesPerDomain: Int, seed: Long,
               rowFrac: Double = 0.45, colKeepProb: Double = 0.5): Benchmark = {
    val rng = new Random(seed)
    val cursor = mutable.Map[String, Int]()

    val perDomain: Seq[(DomainSpec, Seq[(TableData, Int)])] = specs.map { spec =>
      val base = spec.nPartitions / spec.nSources
      val rem = spec.nPartitions % spec.nSources
      val parts = (0 until spec.nSources).flatMap { s =>
        val quota = base + (if (s < rem) 1 else 0)
        val m = buildMaster(world, spec, cursor, rng)
        val prefix = if (spec.nSources == 1) spec.id else s"${spec.id}_s$s"
        partitions(m, quota,
                   fullCopies = if (spec.isQuery && s == 0) queriesPerDomain else 0,
                   rng, rowFrac, colKeepProb, prefix)
      }
      (spec, parts)
    }

    val allTables: Seq[TableData] = perDomain.flatMap(_._2.map(_._1))
    val queries: Seq[QuerySpec] = perDomain.flatMap { case (spec, parts) =>
      if (spec.isQuery)
        parts.take(queriesPerDomain).map { case (td, subjIdx) =>
          QuerySpec(td.tableId, subjIdx)
        }
      else Seq.empty
    }

    val domainOf: Map[String, String] = perDomain.flatMap { case (spec, parts) =>
      parts.map { case (td, _) => td.tableId -> spec.id }
    }.toMap
    val tablesOfDomain: Map[String, Set[String]] =
      domainOf.groupBy(_._2).map { case (d, xs) => d -> xs.keySet }
    val groundTruth: Map[String, Set[String]] =
      queries.map(q => q.tableId -> tablesOfDomain(domainOf(q.tableId))).toMap

    val lakeCells = LakeSchema.cellsOf(spark, allTables)
    val queryIds = queries.map(_.tableId).toSet
    val queryTables = allTables.filter(t => queryIds.contains(t.tableId))
    val queryCells = LakeSchema.cellsOf(spark, queryTables)

    Benchmark(
      name, k, lakeCells, queryCells, queries, groundTruth,
      nLakeTables = allTables.size,
      nLakeColumns = allTables.map(_.colNames.size.toLong).sum,
      nLakeRows = allTables.map(_.rows.size.toLong).sum,
      nQueryTables = queryTables.size,
      nQueryColumns = queryTables.map(_.colNames.size.toLong).sum,
      nQueryRows = queryTables.map(_.rows.size.toLong).sum)
  }

  // ----------------------------------------------------------- domain packs
  //
  // True domains carry nameNoise 0.45 (real lake fragments rarely keep clean
  // headers); trap domains carry 0.05 (their clean, query-matching column
  // names are exactly what seduces a column-only method).

  private val trueNoise = 0.45
  private val trapNoise = 0.05

  private def parks(n: Int, cov: Double, q: Boolean) = DomainSpec(
    "parks", Some("park"), Seq(
      SubjectCol("park_name"), PropCol("supervisor", "ledby"),
      PropCol("city", "locatedin"), ChainCol("state", "locatedin", "locatedin"),
      NumCol("area_acres", 1, 500), YearCol("established")),
    nSubjects = 300, nPartitions = n, kbCoverage = cov, isQuery = q, nameNoise = trueNoise)

  /** Trap: tables about cities themselves — (city, state, country, year)
    * value domains and clean names overlap every city-bearing query domain,
    * but there is no park/school/company column, so they are not unionable
    * with any query (Ex. 2's intent argument).
    */
  private def places(n: Int, cov: Double) = DomainSpec(
    "places", Some("city"), Seq(
      SubjectCol("city"), PropCol("supervisor", "ledby"),
      PropCol("state", "locatedin"),
      ChainCol("country", "locatedin", "locatedin"),
      NumCol("population", 1000, 900000), YearCol("founded")),
    nSubjects = 400, nPartitions = n, kbCoverage = cov, isQuery = false, nameNoise = trapNoise)

  /** Trap for biodiversity: county-keyed statistics (the paper's LARGE
    * anecdote — hospital admissions by county look column-unionable with
    * species-by-county tables).
    */
  private def counties(n: Int, cov: Double) = DomainSpec(
    "counties", Some("county"), Seq(
      SubjectCol("county"), PropCol("state", "locatedin"),
      NumCol("admissions", 1, 5000), YearCol("year")),
    nSubjects = 350, nPartitions = n, kbCoverage = cov, isQuery = false, nameNoise = trapNoise)

  /** Trap partner of parks: shares city/state/year value domains, but the
    * relationship to city is bornIn, not locatedIn (Ex. 1).
    */
  private def birthplaces(n: Int, cov: Double, q: Boolean) = DomainSpec(
    "birthplaces", Some("person"), Seq(
      SubjectCol("person_name"), PropCol("city", "bornin"),
      ChainCol("state", "bornin", "locatedin"), YearCol("birth_year")),
    nSubjects = 320, nPartitions = n, kbCoverage = cov, isQuery = q, nameNoise = trapNoise)

  private def movies(n: Int, cov: Double, q: Boolean) = DomainSpec(
    "movies", Some("movie"), Seq(
      SubjectCol("film_title"), PropCol("director", "directedby"),
      NumCol("budget_musd", 1, 200), YearCol("release_year")),
    nSubjects = 300, nPartitions = n, kbCoverage = cov, isQuery = q, nameNoise = trueNoise)

  /** Trap partner of movies: person-typed column, different relationship. */
  private def albums(n: Int, cov: Double, q: Boolean) = DomainSpec(
    "albums", Some("musicalbum"), Seq(
      SubjectCol("album_title"), PropCol("artist", "performedby"),
      YearCol("release_year")),
    nSubjects = 280, nPartitions = n, kbCoverage = cov, isQuery = q, nameNoise = trapNoise)

  private def schools(n: Int, cov: Double, q: Boolean) = DomainSpec(
    "schools", Some("school"), Seq(
      SubjectCol("school_name"), PropCol("city", "locatedin"),
      ChainCol("state", "locatedin", "locatedin"), NumCol("enrollment", 100, 5000)),
    nSubjects = 300, nPartitions = n, kbCoverage = cov, isQuery = q, nameNoise = trueNoise)

  private def hospitals(n: Int, cov: Double, q: Boolean) = DomainSpec(
    "hospitals", Some("hospital"), Seq(
      SubjectCol("hospital_name"), PropCol("city", "locatedin"),
      NumCol("beds", 20, 900)),
    nSubjects = 280, nPartitions = n, kbCoverage = cov, isQuery = q, nameNoise = trapNoise)

  private def biodiversity(n: Int, cov: Double, q: Boolean) = DomainSpec(
    "biodiversity", Some("species"), Seq(
      SubjectCol("scientific_name"), PropCol("county", "foundin"),
      ChainCol("state", "foundin", "locatedin"), YearCol("documented_year")),
    nSubjects = 350, nPartitions = n, kbCoverage = cov, isQuery = q, nameNoise = trueNoise)

  /** Trap partner of biodiversity (the paper's LARGE anecdote): county/year
    * columns but about accidents, not species.
    */
  private def accidents(n: Int, q: Boolean) = DomainSpec(
    "accidents", None, Seq(
      SubjectCol("incident_id"), LocalPropCol("severity", 5),
      NumCol("admissions", 1, 40), YearCol("year")),
    nSubjects = 300, nPartitions = n, kbCoverage = 0.0, isQuery = q, nameNoise = trapNoise)

  private def companies(n: Int, cov: Double, q: Boolean) = DomainSpec(
    "companies", Some("company"), Seq(
      SubjectCol("company_name"), PropCol("hq_city", "headquarteredin"),
      NumCol("revenue_musd", 1, 9000), YearCol("founded")),
    nSubjects = 300, nPartitions = n, kbCoverage = cov, isQuery = q, nameNoise = trueNoise)

  private def vehicles(n: Int, cov: Double, q: Boolean) = DomainSpec(
    "vehicles", Some("vehicle"), Seq(
      SubjectCol("model"), PropCol("manufacturer", "madeby"),
      NumCol("price_kusd", 10, 120)),
    nSubjects = 250, nPartitions = n, kbCoverage = cov, isQuery = q, nameNoise = trueNoise)

  private def athletes(n: Int, cov: Double, q: Boolean) = DomainSpec(
    "athletes", Some("athlete"), Seq(
      SubjectCol("athlete_name"), PropCol("team", "playsfor"),
      PropCol("birth_city", "bornin"), NumCol("salary_kusd", 50, 5000)),
    nSubjects = 320, nPartitions = n, kbCoverage = cov, isQuery = q, nameNoise = trueNoise)

  private def politicians(n: Int, cov: Double, q: Boolean) = DomainSpec(
    "politicians", Some("politician"), Seq(
      SubjectCol("politician_name"), PropCol("office_city", "worksin"),
      PropCol("birth_city", "bornin"), YearCol("elected")),
    nSubjects = 300, nPartitions = n, kbCoverage = cov, isQuery = q, nameNoise = trueNoise)

  private def books(n: Int, cov: Double, q: Boolean) = DomainSpec(
    "books", Some("book"), Seq(
      SubjectCol("book_title"), PropCol("author", "writtenby"), YearCol("published")),
    nSubjects = 280, nPartitions = n, kbCoverage = cov, isQuery = q, nameNoise = trueNoise)

  private def festivals(n: Int, cov: Double, q: Boolean) = DomainSpec(
    "festivals", Some("festival"), Seq(
      SubjectCol("festival_name"), PropCol("host_city", "heldin"), YearCol("first_held")),
    nSubjects = 240, nPartitions = n, kbCoverage = cov, isQuery = q, nameNoise = trueNoise)

  private def mountains(n: Int, cov: Double, q: Boolean) = DomainSpec(
    "mountains", Some("mountain"), Seq(
      SubjectCol("peak_name"), PropCol("state", "locatedin"),
      NumCol("elevation_m", 300, 6000)),
    nSubjects = 300, nPartitions = n, kbCoverage = cov, isQuery = q, nameNoise = trueNoise)

  private def rivers(n: Int, cov: Double, q: Boolean) = DomainSpec(
    "rivers", Some("river"), Seq(
      SubjectCol("river_name"), PropCol("state", "locatedin"),
      NumCol("length_km", 10, 3000)),
    nSubjects = 260, nPartitions = n, kbCoverage = cov, isQuery = q, nameNoise = trueNoise)

  /** Zero-KB-coverage domains (synthetic vocabularies, Sec. 8.3: the KB had
    * no coverage for 14 of SMALL's 50 queries).
    */
  private def programs(n: Int, q: Boolean) = DomainSpec(
    "programs", None, Seq(
      SubjectCol("program_name"), LocalPropCol("department", 25),
      LocalPropCol("category", 12), NumCol("budget_kusd", 10, 900), YearCol("fiscal_year")),
    nSubjects = 300, nPartitions = n, kbCoverage = 0.0, isQuery = q, nameNoise = trueNoise)

  private def sensors(n: Int, q: Boolean) = DomainSpec(
    "sensors", None, Seq(
      SubjectCol("sensor_id"), LocalPropCol("station", 40),
      LocalPropCol("unit", 8), NumCol("reading", 0, 100)),
    nSubjects = 320, nPartitions = n, kbCoverage = 0.0, isQuery = q, nameNoise = trueNoise)

  private def permits(n: Int, q: Boolean) = DomainSpec(
    "permits", None, Seq(
      SubjectCol("permit_code"), LocalPropCol("permit_type", 15),
      LocalPropCol("issuing_office", 20), YearCol("issued")),
    nSubjects = 300, nPartitions = n, kbCoverage = 0.0, isQuery = q, nameNoise = trueNoise)

  private def grants(n: Int, q: Boolean) = DomainSpec(
    "grants", None, Seq(
      SubjectCol("grant_id"), LocalPropCol("agency", 18),
      LocalPropCol("topic", 22), NumCol("amount_kusd", 5, 500)),
    nSubjects = 280, nPartitions = n, kbCoverage = 0.0, isQuery = q, nameNoise = trueNoise)

  // ------------------------------------------------------- paper benchmarks

  /** TUS-lite: high KB coverage, relationship-labeled queries from 6 of 10
    * seed domains, mild trap density (Sec. 8.1, benchmark 1; the paper's
    * D3L-vs-SANTOS gap is smallest here). k scaled from 60 to 10.
    */
  def tus(spark: SparkSession, world: World, seed: Long = 101L): Benchmark =
    generate(spark, world, "TUS", k = 10, Seq(
      parks(14, 0.90, q = true).copy(nSources = 2),
      movies(14, 0.90, q = true).copy(nSources = 2),
      schools(14, 0.88, q = true).copy(nSources = 2),
      biodiversity(14, 0.90, q = true).copy(nSources = 2),
      companies(14, 0.88, q = true).copy(nSources = 2),
      athletes(14, 0.90, q = true).copy(nSources = 2),
      places(10, 0.90), counties(8, 0.90),
      birthplaces(8, 0.90, q = false), albums(8, 0.90, q = false),
      mountains(6, 0.90, q = false), rivers(6, 0.90, q = false),
      festivals(6, 0.88, q = false), books(6, 0.90, q = false),
    ), queriesPerDomain = 3, seed = seed, rowFrac = 0.45, colKeepProb = 0.5)
    // 6*14 + 10+8 + 2*8 + 4*6 = 142 lake tables, 18 queries (paper: 1530 / 125)

  /** SMALL-lite: mixed coverage with zero-coverage query domains and trap
    * partners (Sec. 8.1, benchmark 2). k scaled from 10 to 5.
    */
  def small(spark: SparkSession, world: World, seed: Long = 202L): Benchmark =
    generate(spark, world, "SMALL", k = 5, Seq(
      parks(9, 0.75, q = true).copy(nSources = 3),
      movies(9, 0.78, q = true).copy(nSources = 3),
      schools(9, 0.72, q = true).copy(nSources = 3),
      politicians(9, 0.75, q = true).copy(nSources = 3),
      programs(9, q = true), sensors(9, q = true), grants(9, q = true),
      places(8, 0.75), birthplaces(6, 0.75, q = false),
      albums(6, 0.78, q = false), hospitals(6, 0.72, q = false),
      vehicles(5, 0.75, q = false), books(5, 0.75, q = false),
    ), queriesPerDomain = 2, seed = seed, rowFrac = 0.4, colKeepProb = 0.5)
    // 7*9 + 8 + 3*6 + 2*5 = 99 lake tables, 14 queries
    // (3 query domains zero-coverage; paper: 550 / 50)

  /** LARGE-lite: many domains, dense traps, low KB coverage, heavier
    * fragmentation (Sec. 8.1, benchmark 3; the paper's gap is largest here).
    * Recall is not reported, matching the paper. k 20 → 10.
    */
  def large(spark: SparkSession, world: World, seed: Long = 303L): Benchmark =
    generate(spark, world, "LARGE", k = 10, Seq(
      parks(14, 0.55, q = true).copy(nSources = 4),
      movies(14, 0.55, q = true).copy(nSources = 4),
      schools(14, 0.50, q = true).copy(nSources = 4),
      biodiversity(14, 0.55, q = true).copy(nSources = 4),
      companies(14, 0.50, q = true).copy(nSources = 4),
      athletes(14, 0.55, q = true).copy(nSources = 4),
      programs(14, q = true), permits(14, q = true),
      places(18, 0.60), counties(14, 0.60),
      birthplaces(14, 0.55, q = false), albums(12, 0.55, q = false),
      hospitals(12, 0.50, q = false), politicians(12, 0.55, q = false),
      vehicles(10, 0.50, q = false), books(10, 0.55, q = false),
      festivals(10, 0.50, q = false), mountains(10, 0.55, q = false),
      rivers(10, 0.50, q = false), accidents(12, q = false),
      sensors(12, q = false), grants(12, q = false),
    ), queriesPerDomain = 3, seed = seed, rowFrac = 0.3, colKeepProb = 0.4)
    // 8*14 + (18+14) + 136 non-query = 280 lake tables, 24 queries (paper: 11090 / 80)
}
