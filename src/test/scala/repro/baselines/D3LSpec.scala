package repro.baselines

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}
import repro.lake.LakeSchema
import repro.lake.LakeSchema.TableData

/** The D³L column-unionability baseline: evidence functions and search. */
class D3LSpec extends SparkSpec {

  // ----------------------------------------------------------- evidence fns

  test("pattern collapses letter and digit runs") {
    assert(D3L.pattern("abc123") === "a9")
    assert(D3L.pattern("ab-12") === "a-9")
    assert(D3L.pattern("2020") === "9")
    assert(D3L.pattern("a b") === "a a")
    assert(D3L.pattern("") === "")
  }

  test("pattern keeps punctuation verbatim") {
    assert(D3L.pattern("12.5") === "9.9")
    assert(D3L.pattern("a,b,c") === "a,a,a")
  }

  test("trigramVector is deterministic and L2-normalized") {
    val v1 = D3L.trigramVector("boston")
    val v2 = D3L.trigramVector("boston")
    assert(v1.toSeq === v2.toSeq)
    assert(math.abs(math.sqrt(v1.map(x => x * x).sum) - 1.0) < 1e-9)
  }

  test("similar strings have higher trigram cosine than dissimilar ones") {
    val a = D3L.trigramVector("boston city")
    val b = D3L.trigramVector("boston town")
    val c = D3L.trigramVector("xylophone")
    assert(D3L.cosine(a, b) > D3L.cosine(a, c))
  }

  test("cosine clamps negative similarity to zero") {
    assert(D3L.cosine(Array(1.0, 0.0), Array(-1.0, 0.0)) === 0.0)
  }

  test("qgrams of a short string is the string itself") {
    assert(D3L.qgrams("ab") === Set("ab"))
    assert(D3L.qgrams("abcd") === Set("abc", "bcd"))
  }

  test("jaccard basics") {
    assert(D3L.jaccard(Set(1, 2), Set(2, 3)) === 1.0 / 3.0)
    assert(D3L.jaccard(Set.empty[Int], Set.empty[Int]) === 0.0)
    assert(D3L.jaccard(Set(1), Set(1)) === 1.0)
  }

  test("weightedJaccard over pattern histograms") {
    val a = Map("a" -> 0.5, "9" -> 0.5)
    val b = Map("a" -> 0.5, "9" -> 0.5)
    assert(D3L.weightedJaccard(a, b) === 1.0)
    assert(D3L.weightedJaccard(a, Map("x" -> 1.0)) === 0.0)
    assert(D3L.weightedJaccard(Map.empty, Map.empty) === 0.0)
  }

  test("decileSimilarity is 1 for identical profiles and decreases with distance") {
    val a = Array(1.0, 2.0, 3.0)
    assert(D3L.decileSimilarity(a, a) === 1.0)
    val far = D3L.decileSimilarity(a, Array(100.0, 200.0, 300.0))
    assert(far < 0.6)
    assert(far < D3L.decileSimilarity(a, Array(1.5, 2.5, 3.5)))
    assert(D3L.decileSimilarity(a, Array.empty) === 0.0)
  }

  // ------------------------------------------------------------- signatures

  private def fixture = LakeSchema.cellsOf(spark, Seq(
    TableData("t1", Seq("park name", "city", "area"), Seq(true, true, false), Seq(
      Seq("Brands Park", "Boston", "10.5"),
      Seq("Kells Park", "Dallas", "20.0"),
      Seq("Union Park", "Boston", "30.5"),
    )),
    TableData("t2", Seq("name of park", "town"), Seq(true, true), Seq(
      Seq("Brands Park", "Boston"),
      Seq("Gill Park", "Austin"),
    )),
    TableData("t3", Seq("film", "director"), Seq(true, true), Seq(
      Seq("Moana", "Ron Clements"),
      Seq("Coco", "Lee Unkrich"),
    )),
  ))

  test("signatures cover every column with the right kind") {
    val sigs = D3L.signatures(fixture)
    assert(sigs.size === 7)
    val numeric = sigs.filter(!_.isString)
    assert(numeric.map(s => (s.table, s.colId)) === Seq(("t1", 2)))
    assert(numeric.head.deciles.nonEmpty)
  }

  test("string-column signatures carry patterns and embeddings") {
    val sig = D3L.signatures(fixture).find(s => s.table == "t1" && s.colId == 0).get
    assert(sig.patterns.nonEmpty)
    assert(sig.emb.exists(_ != 0.0))
    assert(sig.deciles.isEmpty)
  }

  test("valueJaccard matches DuckDB") {
    val got = D3L.valueJaccard(fixture, fixture)
      .filter(col("q_table") === "t1" && col("q_col") === 1)
      .select(col("t_table"), col("t_col").cast("string").as("t_col"),
              format_number(col("jaccard"), 4).as("jaccard"))
    Oracle.assertEquivalent(got,
      """WITH cv AS (
        |  SELECT DISTINCT table_id, col_id, lower(trim(value)) AS value FROM cells
        |  WHERE is_string = 'true' AND value IS NOT NULL
        |), sizes AS (
        |  SELECT table_id, col_id, COUNT(*) AS n FROM cv GROUP BY table_id, col_id
        |), q AS (SELECT * FROM cv WHERE table_id = 't1' AND col_id = '1')
        |SELECT t.table_id AS t_table, t.col_id AS t_col,
        |       printf('%.4f', COUNT(*) * 1.0 /
        |         ((SELECT n FROM sizes WHERE table_id='t1' AND col_id='1')
        |          + ANY_VALUE(ts.n) - COUNT(*))) AS jaccard
        |FROM q JOIN cv t ON q.value = t.value
        |JOIN sizes ts ON ts.table_id = t.table_id AND ts.col_id = t.col_id
        |GROUP BY t.table_id, t.col_id""".stripMargin,
      "cells" -> fixture)
  }

  test("columnScore rejects string-numeric pairs") {
    val sigs = D3L.signatures(fixture)
    val s = sigs.find(s => s.table == "t1" && s.colId == 0).get
    val n = sigs.find(s => s.table == "t1" && s.colId == 2).get
    assert(D3L.columnScore(s, n, 1.0) === 0.0)
  }

  test("search ranks the overlapping park table above the film table") {
    val index = D3L.buildIndex(fixture)
    val q = LakeSchema.cellsOf(spark, Seq(
      TableData("q", Seq("park name", "city"), Seq(true, true), Seq(
        Seq("Brands Park", "Boston"), Seq("Union Park", "Boston")))))
    val out = D3L.search(q, index, Seq("q"), k = 3)("q")
    assert(out.nonEmpty)
    assert(out.head.tableId === "t1")
    val ids = out.map(_.tableId)
    assert(ids.indexOf("t2") >= 0 && (ids.indexOf("t3") == -1 ||
           ids.indexOf("t2") < ids.indexOf("t3")))
  }

  test("search returns at most k tables, sorted by score") {
    val index = D3L.buildIndex(fixture)
    val q = LakeSchema.cellsOf(spark, Seq(
      TableData("q", Seq("city"), Seq(true), Seq(Seq("Boston"), Seq("Dallas")))))
    val out = D3L.search(q, index, Seq("q"), k = 2)("q")
    assert(out.size <= 2)
    assert(out === out.sortBy(r => (-r.score, r.tableId)))
  }
}
