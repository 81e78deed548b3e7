package jobs

import repro.eval.Reports

/** spark-submit entrypoint reproducing Figure 6 (benchmark statistics). */
object Figure6Stats {
  def main(args: Array[String]): Unit = {
    val runner = JobSession.runner("santos-figure6")
    val benches = Seq("TUS", "SMALL", "LARGE").map(runner.benchmark)
    println(Reports.figure6(benches))
  }
}
