package repro.integration

import repro.SparkSpec
import repro.baselines.D3L
import repro.kb.World
import repro.lake.BenchmarkGen

/** Diagnostic (not part of the reproduction): prints D3L's ranking details
  * on LARGE-lite to tune trap density. Run explicitly via testOnly.
  */
class D3LDiagSpec extends SparkSpec {

  test("diag: D3L score distribution on a LARGE parks query", org.scalatest.Tag("repro.Diag")) {
    val world = new World(42L)
    val bench = BenchmarkGen.large(spark, world)
    val q = bench.queries.find(_.tableId.startsWith("parks")).get
    val index = D3L.buildIndex(bench.lakeCells)
    val all = D3L.search(bench.queryCells, index, Seq(q.tableId), k = 40)(q.tableId)
    val rel = bench.groundTruth(q.tableId)
    println(s"== query ${q.tableId}; |gt|=${rel.size}")
    all.zipWithIndex.foreach { case (r, i) =>
      val mark = if (rel.contains(r.tableId)) "TRUE" else "trap"
      println(f"${i + 1}%2d. ${r.tableId}%-22s ${r.score}%.3f $mark")
    }
  }
}
