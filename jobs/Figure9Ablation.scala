package jobs

import repro.eval.Reports

/** spark-submit entrypoint reproducing the Figure 9 ablation (MAP@k of
  * SANTOS_Full vs the fraction of the existing KB retained).
  */
object Figure9Ablation {
  def main(args: Array[String]): Unit = {
    val runner = JobSession.runner("santos-figure9")
    val fractionsOf = Map(
      "TUS" -> Seq(0.0, 0.5, 1.0),
      "SMALL" -> Seq(0.0, 0.25, 0.5, 0.75, 1.0))
    val rows = for {
      bench <- Seq("TUS", "SMALL")
      f <- fractionsOf(bench)
    } yield (bench, f, runner.runAblation(bench, f).avgMap(runner.benchmark(bench).k))
    println(Reports.figure9(rows))
  }
}
