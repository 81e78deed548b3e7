package repro.bench

import repro.SparkSpec
import repro.eval.{BenchRunner, Reports}

/** Figure 6: benchmark statistics (lite-scale counterparts of the paper's
  * TUS / SMALL / LARGE lakes). Prints the same columns the paper reports.
  */
class Figure6BenchmarkStats extends SparkSpec {

  lazy val runner = BenchRunner.shared(spark)

  test("Figure 6: benchmark statistics") {
    val benches = Seq("TUS", "SMALL", "LARGE").map(runner.benchmark)
    println()
    println(Reports.figure6(benches))
    println()

    val byName = benches.map(b => b.name -> b).toMap
    // Lite-scale sanity: LARGE is the biggest lake, TUS > SMALL.
    assert(byName("LARGE").nLakeTables > byName("TUS").nLakeTables)
    assert(byName("TUS").nLakeTables > byName("SMALL").nLakeTables)
    assert(byName("LARGE").nLakeRows > byName("SMALL").nLakeRows)
    // Query tables are a small subset of each lake, as in the paper.
    benches.foreach { b =>
      assert(b.nQueryTables < b.nLakeTables / 3)
      assert(b.queries.size === b.nQueryTables)
    }
  }
}
