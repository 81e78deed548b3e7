package repro.integration

import repro.SparkSpec
import repro.eval.{Harness, Method}
import repro.kb.World
import repro.lake.BenchmarkGen
import repro.lake.BenchmarkGen.DomainSpec

/** End-to-end smoke: a 3-domain micro-lake through the full SANTOS pipeline.
  * Verifies the machinery wires together and that SANTOS ranks same-domain
  * tables over a trap domain sharing column types but not relationships.
  */
class SmokeSpec extends SparkSpec {

  lazy val world = new World(42L)

  lazy val bench = BenchmarkGen.generate(
    spark, world, "MICRO", k = 4,
    Seq(
      DomainSpec("parks", Some("park"), Seq(
        BenchmarkGen.SubjectCol("park_name"),
        BenchmarkGen.PropCol("supervisor", "ledby"),
        BenchmarkGen.PropCol("city", "locatedin")),
        nSubjects = 80, nPartitions = 6, kbCoverage = 0.9, isQuery = true),
      DomainSpec("birthplaces", Some("person"), Seq(
        BenchmarkGen.SubjectCol("person_name"),
        BenchmarkGen.PropCol("city", "bornin")),
        nSubjects = 80, nPartitions = 5, kbCoverage = 0.9, isQuery = false),
      DomainSpec("movies", Some("movie"), Seq(
        BenchmarkGen.SubjectCol("film_title"),
        BenchmarkGen.PropCol("director", "directedby")),
        nSubjects = 80, nPartitions = 5, kbCoverage = 0.9, isQuery = false),
    ),
    queriesPerDomain = 1, seed = 7L)

  test("benchmark generates expected shape") {
    assert(bench.nLakeTables === 16)
    assert(bench.queries.size === 1)
    assert(bench.groundTruth(bench.queries.head.tableId).size === 6)
  }

  test("SANTOS_Full ranks same-domain tables on top") {
    val res = Harness.run(spark, world, bench, Method.SantosFull)
    val q = bench.queries.head.tableId
    val ranked = res.rankings(q)
    assert(ranked.nonEmpty, "no results returned")
    // Self match first, and precision at k high.
    assert(ranked.head.tableId === q, s"expected self first, got ${ranked.take(3)}")
    val rel = bench.groundTruth(q)
    val p = ranked.take(4).count(r => rel.contains(r.tableId)) / 4.0
    assert(p >= 0.75, s"P@4 too low: $p, ranking=${ranked}")
  }

  test("D3L runs and returns rankings") {
    val res = Harness.run(spark, world, bench, Method.D3LBaseline)
    val q = bench.queries.head.tableId
    assert(res.rankings(q).nonEmpty)
  }
}
