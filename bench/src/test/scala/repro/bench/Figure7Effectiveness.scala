package repro.bench

import repro.SparkSpec
import repro.eval.{BenchRunner, Method, Reports}

/** Figure 7: MAP@k, P@k, R@k of TURL, D³L and SANTOS_Full on all three
  * benchmarks (recall omitted on LARGE, as in the paper).
  *
  * Paper (for the shape):
  *   TUS   (k=60): TURL .13/.16/.08, D3L .64/.58/.31, SANTOS .80/.70/.37
  *   SMALL (k=10): D3L .52/.58/.42, SANTOS .93/.90/.68
  *   LARGE (k=20): D3L .29/.26/-,  SANTOS .77/.73/-
  */
class Figure7Effectiveness extends SparkSpec {

  lazy val runner = BenchRunner.shared(spark)

  test("Figure 7: effectiveness of TURL, D3L and SANTOS") {
    val tusK = runner.benchmark("TUS").k
    val smallK = runner.benchmark("SMALL").k
    val largeK = runner.benchmark("LARGE").k

    val rows = Seq(
      ("TUS", tusK, runner.run("TUS", Method.TurlBaseline), true),
      ("TUS", tusK, runner.run("TUS", Method.D3LBaseline), true),
      ("TUS", tusK, runner.run("TUS", Method.SantosFull), true),
      ("SMALL", smallK, runner.run("SMALL", Method.D3LBaseline), true),
      ("SMALL", smallK, runner.run("SMALL", Method.SantosFull), true),
      ("LARGE", largeK, runner.run("LARGE", Method.D3LBaseline), false),
      ("LARGE", largeK, runner.run("LARGE", Method.SantosFull), false),
    )
    println()
    println(Reports.figure7(rows))
    println()

    def res(bench: String, m: Method) = rows.find(r => r._1 == bench && r._3.method == m).get._3

    // Paper shape 1: SANTOS beats D3L on every benchmark, on MAP and P.
    Seq(("TUS", tusK), ("SMALL", smallK), ("LARGE", largeK)).foreach { case (b, k) =>
      val santos = res(b, Method.SantosFull)
      val d3l = res(b, Method.D3LBaseline)
      assert(santos.avgMap(k) > d3l.avgMap(k), s"$b MAP: ${santos.avgMap(k)} vs ${d3l.avgMap(k)}")
      assert(santos.avgP(k) > d3l.avgP(k), s"$b P: ${santos.avgP(k)} vs ${d3l.avgP(k)}")
    }

    // Paper shape 2: TURL is far below both on TUS.
    val turl = res("TUS", Method.TurlBaseline)
    assert(turl.avgMap(tusK) < res("TUS", Method.D3LBaseline).avgMap(tusK))
    assert(turl.avgMap(tusK) < 0.5 * res("TUS", Method.SantosFull).avgMap(tusK))

    // Paper shape 3: the SANTOS/D3L gap is largest on LARGE (dense traps,
    // low KB coverage) — in the paper P@k improves by >150% there vs ~20% on TUS.
    val gapTus = res("TUS", Method.SantosFull).avgP(tusK) / res("TUS", Method.D3LBaseline).avgP(tusK)
    val gapLarge = res("LARGE", Method.SantosFull).avgP(largeK) / res("LARGE", Method.D3LBaseline).avgP(largeK)
    assert(gapLarge > gapTus, s"gap LARGE=$gapLarge should exceed gap TUS=$gapTus")

    // Absolute sanity: SANTOS is a working search system on every benchmark.
    assert(res("TUS", Method.SantosFull).avgP(tusK) > 0.6)
    assert(res("SMALL", Method.SantosFull).avgP(smallK) > 0.6)
    assert(res("LARGE", Method.SantosFull).avgP(largeK) > 0.5)
  }
}
