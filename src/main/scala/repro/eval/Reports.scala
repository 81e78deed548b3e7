package repro.eval

import repro.lake.BenchmarkGen.Benchmark

/** Renders the paper's evaluation tables (Figures 6, 7, 8-data, 9-data, 10)
  * from harness results, in the same row layout the paper reports so the
  * numbers can be diffed against EXPERIMENTS.md.
  */
object Reports {

  private def fmtRow(cells: Seq[String], widths: Seq[Int]): String =
    cells.zip(widths).map { case (c, w) => c.padTo(w, ' ') }.mkString("| ", " | ", " |")

  def table(header: Seq[String], rows: Seq[Seq[String]]): String = {
    val widths = (header +: rows).transpose.map(_.map(_.length).max)
    val sep = widths.map("-" * _).mkString("|-", "-|-", "-|")
    (fmtRow(header, widths) +: sep +: rows.map(fmtRow(_, widths))).mkString("\n")
  }

  /** Fig. 6: benchmark statistics. */
  def figure6(benchmarks: Seq[Benchmark]): String =
    "Figure 6 (lite): benchmark statistics\n" + table(
      Seq("Source", "Lake#Tables", "Lake#Cols", "Lake#Rows",
          "Q#Tables", "Q#Cols", "Q#Rows"),
      benchmarks.map(b => Seq(
        b.name, b.nLakeTables.toString, b.nLakeColumns.toString, b.nLakeRows.toString,
        b.nQueryTables.toString, b.nQueryColumns.toString, b.nQueryRows.toString)))

  /** Fig. 7: MAP@k / P@k / R@k per benchmark and method. */
  def figure7(rows: Seq[(String, Int, RunResult, Boolean)]): String =
    "Figure 7 (lite): effectiveness comparison\n" + table(
      Seq("Benchmark", "Method", "MAP@k", "P@k", "R@k"),
      rows.map { case (bench, k, r, withRecall) => Seq(
        s"$bench (k=$k)", r.method.label,
        f"${r.avgMap(k)}%.2f", f"${r.avgP(k)}%.2f",
        if (withRecall) f"${r.avgR(k)}%.2f" else "-")
      })

  /** Fig. 8 data: P@k and R@k curves over k. */
  def figure8(bench: String, kMax: Int, runs: Seq[RunResult],
              idealRecall: Int => Double): String = {
    val header = Seq("k") ++ runs.map(r => s"P@k ${r.method.label}") ++
                 runs.map(r => s"R@k ${r.method.label}") ++ Seq("R@k Ideal")
    val rows = (1 to kMax).map { k =>
      Seq(k.toString) ++ runs.map(r => f"${r.avgP(k)}%.2f") ++
        runs.map(r => f"${r.avgR(k)}%.2f") ++ Seq(f"${idealRecall(k)}%.2f")
    }
    s"Figure 8 data (lite): $bench precision/recall vs k\n" + table(header, rows)
  }

  /** Fig. 9 data: MAP@k of SANTOS_Full vs retained KB fraction. */
  def figure9(rows: Seq[(String, Double, Double)]): String =
    "Figure 9 data (lite): MAP@k of SANTOS_Full vs % of existing KB\n" + table(
      Seq("Benchmark", "KB fraction", "MAP@k"),
      rows.map { case (b, f, m) => Seq(b, f"$f%.2f", f"$m%.2f") })

  /** Fig. 10: indexing and query times. */
  def figure10(rows: Seq[(String, RunResult)]): String =
    "Figure 10 (lite): indexing and query times\n" + table(
      Seq("Benchmark", "Method", "Indexing", "Query avg (s)", "Query p10-p90 (s)"),
      rows.map { case (bench, r) =>
        Seq(bench, r.method.label, fmtMillis(r.indexMillis),
            f"${r.avgQueryMillis / 1000.0}%.2f",
            f"${r.p10QueryMillis / 1000.0}%.2f - ${r.p90QueryMillis / 1000.0}%.2f")
      })

  def fmtMillis(ms: Long): String = {
    val s = ms / 1000.0
    if (s >= 60) f"${(s / 60).toInt}%d min ${(s % 60).toInt}%02d s" else f"$s%.1f s"
  }
}
