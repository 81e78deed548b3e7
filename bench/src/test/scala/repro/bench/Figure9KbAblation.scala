package repro.bench

import repro.SparkSpec
import repro.eval.{BenchRunner, Reports}

/** Figure 9 (underlying data): MAP@k of SANTOS_Full as the fraction of the
  * existing KB retained grows from 0% (synthesized KB only) to 100%.
  *
  * Paper shape: effectiveness increases near-linearly with KB coverage, and
  * the 0% point is already a decent search system (MAP 68% on TUS, 81% on
  * SMALL), because the synthesized KB compensates.
  */
class Figure9KbAblation extends SparkSpec {

  lazy val runner = BenchRunner.shared(spark)

  /** SMALL gets the full 5-point sweep; TUS (whose SANTOS runs are ~3x more
    * expensive) gets 3 points — enough to exhibit the trend.
    */
  private val fractionsOf = Map(
    "TUS" -> Seq(0.0, 0.5, 1.0),
    "SMALL" -> Seq(0.0, 0.25, 0.5, 0.75, 1.0))

  test("Figure 9 data: MAP@k vs KB fraction") {
    val rows = for {
      bench <- Seq("TUS", "SMALL")
      f <- fractionsOf(bench)
    } yield {
      val k = runner.benchmark(bench).k
      (bench, f, runner.runAblation(bench, f).avgMap(k))
    }
    println()
    println(Reports.figure9(rows))
    println()

    Seq("TUS", "SMALL").foreach { bench =>
      val series = fractionsOf(bench).map(f => rows.find(r => r._1 == bench && r._2 == f).get._3)
      // Full KB strictly helps over no KB.
      assert(series.last >= series.head,
        s"$bench: MAP at 100% (${series.last}) < MAP at 0% (${series.head})")
      // The 0% point is still a usable system (the synthesized KB carries it).
      assert(series.head > 0.4, s"$bench: synth-only MAP too low: ${series.head}")
      // Broadly increasing: each point is within a small tolerance of the
      // running maximum (random KB subsets wobble, the trend should not).
      series.scanLeft(0.0)(math.max).zip(series).foreach { case (runMax, v) =>
        assert(v >= runMax - 0.12, s"$bench: non-monotone beyond tolerance: $series")
      }
    }
  }
}
