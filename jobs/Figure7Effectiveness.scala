package jobs

import repro.eval.{Method, Reports}

/** spark-submit entrypoint reproducing Figure 7 (effectiveness of TURL, D³L
  * and SANTOS on TUS/SMALL/LARGE).
  */
object Figure7Effectiveness {
  def main(args: Array[String]): Unit = {
    val runner = JobSession.runner("santos-figure7")
    val rows = Seq(
      ("TUS", Method.TurlBaseline, true),
      ("TUS", Method.D3LBaseline, true),
      ("TUS", Method.SantosFull, true),
      ("SMALL", Method.D3LBaseline, true),
      ("SMALL", Method.SantosFull, true),
      ("LARGE", Method.D3LBaseline, false),
      ("LARGE", Method.SantosFull, false),
    ).map { case (b, m, recall) =>
      (b, runner.benchmark(b).k, runner.run(b, m), recall)
    }
    println(Reports.figure7(rows))
  }
}
