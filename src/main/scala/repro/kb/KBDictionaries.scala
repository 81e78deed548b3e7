package repro.kb

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import scala.util.Random

/** Knobs for building a (possibly degraded) KB index.
  *
  * @param entityFraction fraction of entities retained — the Fig. 9 ablation
  *                       removes KB entities at random and re-measures MAP@k
  * @param keepTopLevels  if set, drop entities outside these top-level types
  *                       (TURL's web-table domain bias)
  * @param keepPredicates if set, drop facts with other predicates
  * @param typeNoise      fraction of entities whose direct type is remapped to
  *                       a random other type (TURL's annotation noise)
  * @param sampleSeed     seed for entity subsampling
  * @param noiseSeed      seed for type noise
  */
final case class KBConfig(
    entityFraction: Double = 1.0,
    keepTopLevels: Option[Set[String]] = None,
    keepPredicates: Option[Set[String]] = None,
    typeNoise: Double = 0.0,
    sampleSeed: Long = 17L,
    noiseSeed: Long = 23L)

/** The paper's four KB dictionaries (Sec. 7.1) materialized as DataFrames.
  *
  * @param labels         entity dictionary: (label, entity_id) — canonical and
  *                       alternate names, lower-cased
  * @param typeDict       type dictionary expanded through the hierarchy:
  *                       (label, type_id, top_level, gs); one row per
  *                       (label, ancestor-or-self type) of any entity with that
  *                       label. gs is the Eq. (2) granularity score.
  * @param relDict        relationship dictionary: (label_subj, label_obj,
  *                       predicate, pred_pairs) for every labeled fact;
  *                       pred_pairs is the predicate's KB pair count, used for
  *                       the Eq. (4) rarer-predicate tie-break
  * @param coveredLabels  distinct labels present in the KB (defines "mapped to
  *                       the KB" for Eq. 1 and Eq. 4 denominators)
  * @param topLevelCounts entities per top-level type (majority tie-break of
  *                       Sec. 4.1 footnote 3: rarer top-level wins)
  */
final class KBIndex(
    val labels: DataFrame,
    val typeDict: DataFrame,
    val relDict: DataFrame,
    val coveredLabels: DataFrame,
    val topLevelCounts: Map[String, Long],
    val typeGs: Map[String, Double]) extends Serializable {

  /** Persist and force all dictionaries (indexing is a timed phase). */
  def materialize(): this.type = {
    Seq(labels, typeDict, relDict, coveredLabels).foreach { df =>
      df.persist(); val _ = df.count()
    }
    this
  }

  def unpersistAll(): Unit =
    Seq(labels, typeDict, relDict, coveredLabels).foreach(_.unpersist())
}

object KBDictionaries {

  /** Granularity score, Eq. (2) as intended by the text: the printed formula
    * `1/min(1, log count)` is a typo — Ex. 14 pins gs(place: 6M)≈0.14 and
    * gs(city: 42k)≈0.22, i.e. `gs(a) = 1 / max(1, log10(a.count))`, which also
    * satisfies the stated 0..1 range (rare types with <10 entities get 1).
    */
  def granularityScore(entityCount: Long): Double =
    1.0 / math.max(1.0, math.log10(entityCount.toDouble))

  /** Builds the four dictionaries from the synthetic world on the driver
    * (the world is small) and ships them as DataFrames.
    */
  def build(spark: SparkSession, world: World, config: KBConfig = KBConfig()): KBIndex = {
    import spark.implicits._

    // 1. Entity subsampling (Fig. 9) + top-level filtering (TURL bias).
    val sampleRng = new Random(config.sampleSeed)
    val kept0 = world.entities.filter(_ => sampleRng.nextDouble() < config.entityFraction)
    val kept = config.keepTopLevels match {
      case Some(tops) => kept0.filter(e => tops.contains(world.topLevelOf(e.typeId)))
      case None       => kept0
    }
    val keptIds = kept.map(_.id).toSet

    // 2. Direct type assignment, with optional noise (TURL misannotation).
    // The noise pool respects keepTopLevels: a degraded annotator mislabels
    // within its own vocabulary, it does not invent types it was never
    // trained on.
    val noiseRng = new Random(config.noiseSeed)
    val allTypes = world.allTypes.toVector.sorted.filter(t =>
      config.keepTopLevels.forall(_.contains(world.topLevelOf(t))))
    val directTypes: Seq[(Long, String)] = kept.map { e =>
      val t =
        if (config.typeNoise > 0 && noiseRng.nextDouble() < config.typeNoise)
          allTypes(noiseRng.nextInt(allTypes.length))
        else e.typeId
      e.id -> t
    }
    val directTypeById = directTypes.toMap

    // 3. Entity counts per (self-or-ancestor) type over the kept population.
    val typeCounts: Map[String, Long] = directTypes
      .flatMap { case (_, t) => world.selfAndAncestors(t) }
      .groupBy(identity).map { case (t, xs) => t -> xs.size.toLong }
    val gs: Map[String, Double] = typeCounts.map { case (t, n) => t -> granularityScore(n) }
    val topLevelCounts: Map[String, Long] =
      typeCounts.filter { case (t, _) => world.typeParents(t) == world.root }

    // 4. Entity dictionary: canonical + alternate labels.
    val labelRows: Seq[(String, Long)] =
      kept.flatMap(e => (e.label +: e.altLabels).map(l => (l, e.id)))
    val labels = labelRows.toDF("label", "entity_id")

    // 5. Type dictionary: label -> every self-or-ancestor type with gs.
    val typeDictRows: Seq[(String, String, String, Double)] = labelRows.flatMap {
      case (label, id) =>
        val direct = directTypeById(id)
        world.selfAndAncestors(direct).map { t =>
          (label, t, world.topLevelOf(t), gs(t))
        }
    }.distinct
    val typeDict = typeDictRows.toDF("label", "type_id", "top_level", "gs")

    // 6. Relationship dictionary over kept entities (and kept predicates).
    val keptFacts = world.facts.filter { f =>
      keptIds.contains(f.subj) && keptIds.contains(f.obj) &&
        config.keepPredicates.forall(_.contains(f.predicate))
    }
    val predPairs: Map[String, Long] =
      keptFacts.groupBy(_.predicate).map { case (p, fs) =>
        p -> fs.map(f => (f.subj, f.obj)).distinct.size.toLong
      }
    val labelsById: Map[Long, Seq[String]] =
      kept.map(e => e.id -> (e.label +: e.altLabels)).toMap
    val relRows: Seq[(String, String, String, Long)] = keptFacts.flatMap { f =>
      for {
        ls <- labelsById(f.subj)
        lo <- labelsById(f.obj)
      } yield (ls, lo, f.predicate, predPairs(f.predicate))
    }.distinct
    val relDict = relRows.toDF("label_subj", "label_obj", "predicate", "pred_pairs")

    val covered = labels.select("label").distinct()

    new KBIndex(labels, typeDict, relDict, covered, topLevelCounts, gs)
  }
}
