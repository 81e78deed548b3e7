package repro.baselines

import repro.kb.KBConfig

/** TURL-like baseline (Sec. 8.1): the paper treats TURL — a representation
  * model pre-trained on *web tables* — as a KB that annotates CS and RS, then
  * indexes the lake exactly like SANTOS_KB. Its failure mode on open data is
  * annotation quality: web-table vocabulary bias, missing entities, and
  * misannotations. We model that directly as a degraded KB annotator:
  *
  *  - only web-table-popular top-level domains are known (people, places,
  *    creative works — no species/events/products/organizations);
  *  - only a fraction of entities is recognized at all;
  *  - a fraction of type assignments is wrong (seeded noise);
  *  - only a handful of popular predicates is extracted.
  *
  * The harness plugs this config into the standard SANTOS_KB pipeline
  * (no synthesized KB), matching the paper's setup.
  */
object Turl {

  /** The degraded-annotator configuration used by the harness. */
  val kbConfig: KBConfig = KBConfig(
    entityFraction = 0.35,
    keepTopLevels = Some(Set("person", "place", "creativework")),
    keepPredicates = Some(Set("bornin", "directedby", "locatedin", "performedby")),
    typeNoise = 0.25,
    sampleSeed = 91L,
    noiseSeed = 92L)
}
