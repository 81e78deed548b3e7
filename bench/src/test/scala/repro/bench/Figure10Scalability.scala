package repro.bench

import repro.SparkSpec
import repro.eval.{BenchRunner, Method, Reports}

/** Figure 10: indexing time and per-query time (average and p10–p90) for
  * D³L, SANTOS_Full, SANTOS_KB and SANTOS_Synth on TUS and SMALL, and D³L vs
  * SANTOS_Full on LARGE (the rows the paper reports).
  *
  * Paper shape: D³L indexes the lake several times faster than SANTOS (no KB
  * joins, no FD mining), while SANTOS's inverted indexes answer queries
  * faster on the larger lakes. Absolute numbers are not comparable — the
  * paper's lakes are 25–170x bigger and its implementation is single-node
  * Python; at lite scale per-job Spark overhead dominates the query phase
  * (see EXPERIMENTS.md).
  */
class Figure10Scalability extends SparkSpec {

  lazy val runner = BenchRunner.shared(spark)

  test("Figure 10: indexing and query times") {
    val rows = Seq(
      ("TUS", runner.run("TUS", Method.D3LBaseline)),
      ("TUS", runner.run("TUS", Method.SantosFull)),
      ("TUS", runner.run("TUS", Method.SantosKB)),
      ("TUS", runner.run("TUS", Method.SantosSynth)),
      ("SMALL", runner.run("SMALL", Method.D3LBaseline)),
      ("SMALL", runner.run("SMALL", Method.SantosFull)),
      ("SMALL", runner.run("SMALL", Method.SantosKB)),
      ("SMALL", runner.run("SMALL", Method.SantosSynth)),
      ("LARGE", runner.run("LARGE", Method.D3LBaseline)),
      ("LARGE", runner.run("LARGE", Method.SantosFull)),
    )
    println()
    println(Reports.figure10(rows))
    println()

    def res(bench: String, m: Method) = rows.find(r => r._1 == bench && r._2.method == m).get._2

    // Paper shape: D3L's column-profile indexing is faster than SANTOS_Full's
    // KB joins + FD mining on every benchmark.
    Seq("TUS", "SMALL", "LARGE").foreach { b =>
      val d3l = res(b, Method.D3LBaseline)
      val full = res(b, Method.SantosFull)
      assert(d3l.indexMillis < full.indexMillis,
        s"$b: D3L indexing (${d3l.indexMillis} ms) should beat SANTOS (${full.indexMillis} ms)")
    }

    // Timing data is present for every run (the Fig. 10 sample).
    rows.foreach { case (b, r) =>
      assert(r.indexMillis > 0, s"$b/${r.method.label}: no indexing time")
      assert(r.queryTimesMillis.size === runner.timedQueries,
        s"$b/${r.method.label}: missing query-time sample")
      assert(r.queryTimesMillis.forall(_ > 0))
      assert(r.p10QueryMillis <= r.avgQueryMillis * 1.5 + 1)
      assert(r.p10QueryMillis <= r.p90QueryMillis)
    }

    // Indexing scales with the lake: LARGE costs more than SMALL for both systems.
    assert(res("LARGE", Method.SantosFull).indexMillis >
           res("SMALL", Method.SantosFull).indexMillis)
    assert(res("LARGE", Method.D3LBaseline).indexMillis >
           res("SMALL", Method.D3LBaseline).indexMillis)
  }
}
