package jobs

import repro.eval.{Method, Metrics, Reports}

/** spark-submit entrypoint reproducing the Figure 8 curves (P@k / R@k vs k
  * for the SANTOS variants and baselines on TUS and SMALL).
  */
object Figure8Curves {
  def main(args: Array[String]): Unit = {
    val runner = JobSession.runner("santos-figure8")

    def ideal(bench: String)(k: Int): Double = {
      val b = runner.benchmark(bench)
      Metrics.mean(b.queries.map(q => Metrics.idealRecallAtK(b.groundTruth(q.tableId).size, k)))
    }

    val tus = Seq(Method.SantosFull, Method.SantosKB, Method.SantosSynth,
                  Method.D3LBaseline, Method.TurlBaseline).map(runner.run("TUS", _))
    println(Reports.figure8("TUS", runner.benchmark("TUS").k, tus, ideal("TUS")))
    println()
    val small = Seq(Method.SantosFull, Method.SantosKB, Method.SantosSynth,
                    Method.D3LBaseline).map(runner.run("SMALL", _))
    println(Reports.figure8("SMALL", runner.benchmark("SMALL").k, small, ideal("SMALL")))
  }
}
