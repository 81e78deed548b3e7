package jobs

import repro.eval.{Method, Reports}

/** spark-submit entrypoint reproducing Figure 10 (indexing and query times). */
object Figure10Scalability {
  def main(args: Array[String]): Unit = {
    val runner = JobSession.runner("santos-figure10")
    val rows = Seq(
      ("TUS", Method.D3LBaseline), ("TUS", Method.SantosFull),
      ("TUS", Method.SantosKB), ("TUS", Method.SantosSynth),
      ("SMALL", Method.D3LBaseline), ("SMALL", Method.SantosFull),
      ("SMALL", Method.SantosKB), ("SMALL", Method.SantosSynth),
      ("LARGE", Method.D3LBaseline), ("LARGE", Method.SantosFull),
    ).map { case (b, m) => (b, runner.run(b, m)) }
    println(Reports.figure10(rows))
  }
}
