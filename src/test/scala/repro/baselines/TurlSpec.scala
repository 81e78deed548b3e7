package repro.baselines

import repro.SparkSpec
import repro.kb.{KBDictionaries, World}

/** The TURL-like degraded annotator: the degradation actually degrades. */
class TurlSpec extends SparkSpec {

  lazy val world = new World(42L)
  lazy val full = KBDictionaries.build(spark, world)
  lazy val turl = KBDictionaries.build(spark, world, Turl.kbConfig)

  test("the TURL annotator recognizes far fewer entities than the full KB") {
    val f = full.labels.count()
    val t = turl.labels.count()
    assert(t < 0.4 * f, s"turl=$t full=$f")
  }

  test("the TURL annotator only knows web-table-popular domains") {
    val tops = turl.typeDict.select("top_level").distinct()
      .collect().map(_.getString(0)).toSet
    assert(tops.subsetOf(Set("person", "place", "creativework")))
  }

  test("the TURL annotator extracts only popular predicates") {
    val preds = turl.relDict.select("predicate").distinct()
      .collect().map(_.getString(0)).toSet
    assert(preds.subsetOf(Set("bornin", "directedby", "locatedin", "performedby")))
    assert(!preds.contains("foundin"))
  }

  test("the TURL annotator misannotates a fraction of types") {
    import org.apache.spark.sql.functions.col
    // Noise moves some entities out of their true direct type: with 25% noise
    // over the kept population, many labels disagree with the clean KB.
    val clean = full.typeDict.select("label", "type_id")
    val noisy = turl.typeDict.select("label", "type_id")
    val disagreements = noisy.exceptAll(clean.join(noisy.select("label").distinct(), "label"))
    assert(disagreements.count() > 100)
    val _ = col("label") // keep the import referenced
  }

  test("degradation is deterministic") {
    val again = KBDictionaries.build(spark, world, Turl.kbConfig)
    assert(again.typeDict.exceptAll(turl.typeDict).count() === 0)
  }
}
