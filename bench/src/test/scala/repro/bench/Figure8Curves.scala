package repro.bench

import repro.SparkSpec
import repro.eval.{BenchRunner, Method, Metrics, Reports}

/** Figure 8 (underlying data): P@k and R@k over k for SANTOS_Full,
  * SANTOS_KB, SANTOS_Synth, D³L (and TURL on TUS), plus the ideal-recall
  * line, on TUS and SMALL.
  *
  * Paper shape: SANTOS_Full dominates at every k; on TUS the KB variant
  * beats the Synth variant, on SMALL the Synth variant carries the queries
  * the KB cannot cover (14 of 50 in the paper).
  */
class Figure8Curves extends SparkSpec {

  lazy val runner = BenchRunner.shared(spark)

  private def idealRecall(bench: String)(k: Int): Double = {
    val b = runner.benchmark(bench)
    Metrics.mean(b.queries.map(q => Metrics.idealRecallAtK(b.groundTruth(q.tableId).size, k)))
  }

  test("Figure 8 data: TUS curves") {
    val k = runner.benchmark("TUS").k
    val runs = Seq(
      runner.run("TUS", Method.SantosFull),
      runner.run("TUS", Method.SantosKB),
      runner.run("TUS", Method.SantosSynth),
      runner.run("TUS", Method.D3LBaseline),
      runner.run("TUS", Method.TurlBaseline))
    println()
    println(Reports.figure8("TUS", k, runs, idealRecall("TUS")))
    println()

    val Seq(full, kb, synth, d3l, turl) = runs
    // Full dominates each component and the baselines at the benchmark k.
    // (Small tolerance: SANTOS_Full's synthesized dictionary excludes
    // KB-covered value pairs per Sec. 7.2, so it is slightly thinner than
    // standalone SANTOS_Synth's and per-query inversions of a fraction of a
    // point are possible.)
    assert(full.avgP(k) >= kb.avgP(k) - 0.03)
    assert(full.avgP(k) >= synth.avgP(k) - 0.03)
    assert(full.avgP(k) > d3l.avgP(k))
    assert(full.avgP(k) > turl.avgP(k))
    // Recall tracks precision and stays below the ideal line.
    (1 to k).foreach { i =>
      assert(full.avgR(i) <= idealRecall("TUS")(i) + 1e-9)
    }
  }

  test("Figure 8 data: SMALL curves") {
    val k = runner.benchmark("SMALL").k
    val runs = Seq(
      runner.run("SMALL", Method.SantosFull),
      runner.run("SMALL", Method.SantosKB),
      runner.run("SMALL", Method.SantosSynth),
      runner.run("SMALL", Method.D3LBaseline))
    println()
    println(Reports.figure8("SMALL", k, runs, idealRecall("SMALL")))
    println()

    val Seq(full, kb, synth, d3l) = runs
    assert(full.avgP(k) >= synth.avgP(k) - 0.03)
    assert(full.avgP(k) > d3l.avgP(k))
    // The paper's SMALL phenomenon: the KB has no coverage for several query
    // tables (3 of 7 query domains here), so KB-only trails Synth-only.
    assert(synth.avgP(k) > kb.avgP(k),
      s"synth=${synth.avgP(k)} should beat kb=${kb.avgP(k)} on SMALL")
    // KB-only returns nothing at all for the zero-coverage queries.
    val zeroCov = runner.benchmark("SMALL").queries
      .filter(q => Seq("programs", "sensors", "grants").exists(q.tableId.startsWith))
    assert(zeroCov.nonEmpty)
    zeroCov.foreach(q => assert(kb.rankings(q.tableId).isEmpty))
  }
}
