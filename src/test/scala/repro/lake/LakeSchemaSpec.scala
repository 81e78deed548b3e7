package repro.lake

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}
import repro.lake.LakeSchema.TableData

/** Cells representation and its derived relations, cross-checked against
  * DuckDB SQL via the oracle.
  */
class LakeSchemaSpec extends SparkSpec {

  private def fixtureCells = LakeSchema.cellsOf(spark, Seq(
    TableData("t1", Seq("park", "city", "area"), Seq(true, true, false), Seq(
      Seq("Brands Park", "Boston", "10.5"),
      Seq("Kells Park", "Boston", "3.2"),
      Seq("Union Park", "Dallas", "7.7"),
      Seq(" Union Park ", "dallas", "7.7"), // normalizes to a duplicate
      Seq(null, "NaN", null),
    )),
    TableData("t2", Seq("person", "city"), Seq(true, true), Seq(
      Seq("Ada", "Boston"),
      Seq("Bob", "-"),
    )),
  ))

  test("normalizeValue lower-cases, trims and drops null tokens") {
    assert(LakeSchema.normalizeValue("  Boston ") === Some("boston"))
    assert(LakeSchema.normalizeValue(null) === None)
    assert(LakeSchema.normalizeValue("NaN") === None)
    assert(LakeSchema.normalizeValue("null") === None)
    assert(LakeSchema.normalizeValue("N/A") === None)
    assert(LakeSchema.normalizeValue("-") === None)
    assert(LakeSchema.normalizeValue("") === None)
    assert(LakeSchema.normalizeValue("x") === Some("x"))
  }

  test("cellsOf emits one row per cell") {
    assert(fixtureCells.count() === 5 * 3 + 2 * 2)
  }

  test("cellsOf rejects ragged rows") {
    assertThrows[IllegalArgumentException] {
      TableData("bad", Seq("a", "b"), Seq(true, true), Seq(Seq("x")))
    }
  }

  test("cellsOf rejects mismatched isString length") {
    assertThrows[IllegalArgumentException] {
      TableData("bad", Seq("a", "b"), Seq(true), Seq(Seq("x", "y")))
    }
  }

  test("stringCells keeps only normalized, non-null string-column values") {
    val sc = LakeSchema.stringCells(fixtureCells)
    assert(sc.filter(!col("is_string")).count() === 0)
    val vals = sc.select("value").collect().map(_.getString(0))
    assert(vals.forall(v => v == v.toLowerCase && v == v.trim && v.nonEmpty))
    assert(!vals.contains("nan") && !vals.contains("-"))
  }

  test("distinctColumnValues de-duplicates normalized values") {
    val d = LakeSchema.distinctColumnValues(fixtureCells)
    val t1c0 = d.filter(col("table_id") === "t1" && col("col_id") === 0)
      .collect().map(_.getString(2)).toSet
    assert(t1c0 === Set("brands park", "kells park", "union park"))
  }

  test("distinctValueCounts matches DuckDB") {
    val got = LakeSchema.distinctValueCounts(fixtureCells)
      .select(col("table_id"), col("col_id").cast("string").as("col_id"),
              col("n_distinct").cast("string").as("n_distinct"))
    Oracle.assertEquivalent(got,
      """SELECT table_id, col_id,
        |       CAST(COUNT(DISTINCT lower(trim(value))) AS VARCHAR) AS n_distinct
        |FROM cells
        |WHERE is_string = 'true' AND value IS NOT NULL
        |  AND lower(trim(value)) NOT IN ('', 'null', 'nan', 'none', 'n/a', '-')
        |GROUP BY table_id, col_id""".stripMargin,
      "cells" -> fixtureCells)
  }

  test("valuePairs matches a DuckDB self-join") {
    val got = LakeSchema.valuePairs(fixtureCells)
      .select(col("table_id"), col("col_a").cast("string").as("col_a"),
              col("col_b").cast("string").as("col_b"), col("value_a"), col("value_b"))
    Oracle.assertEquivalent(got,
      """WITH sc AS (
        |  SELECT table_id, col_id, row_id, lower(trim(value)) AS value
        |  FROM cells
        |  WHERE is_string = 'true' AND value IS NOT NULL
        |    AND lower(trim(value)) NOT IN ('', 'null', 'nan', 'none', 'n/a', '-')
        |)
        |SELECT DISTINCT a.table_id, a.col_id AS col_a, b.col_id AS col_b,
        |       a.value AS value_a, b.value AS value_b
        |FROM sc a JOIN sc b
        |  ON a.table_id = b.table_id AND a.row_id = b.row_id AND a.col_id <> b.col_id""".stripMargin,
      "cells" -> fixtureCells)
  }

  test("valuePairs emits both orientations") {
    val vp = LakeSchema.valuePairs(fixtureCells)
    val fwd = vp.filter(col("table_id") === "t2" && col("col_a") === 0 &&
                        col("value_a") === "ada").count()
    val bwd = vp.filter(col("table_id") === "t2" && col("col_a") === 1 &&
                        col("value_b") === "ada").count()
    assert(fwd === 1) // (ada, boston); (bob, -) dropped via null token
    assert(bwd === 1) // (boston, ada)
  }

  test("valuePairs never pairs a column with itself") {
    assert(LakeSchema.valuePairs(fixtureCells).filter(col("col_a") === col("col_b")).count() === 0)
  }

  test("valuePairs drops rows whose partner value is null-like") {
    val vp = LakeSchema.valuePairs(fixtureCells).filter(col("table_id") === "t2")
    assert(vp.count() === 2) // only (ada,boston) and (boston,ada)
  }

  test("columnProfile lists every column once") {
    val prof = LakeSchema.columnProfile(fixtureCells).collect()
    assert(prof.length === 5)
    assert(prof.count(r => !r.getBoolean(3)) === 1)
  }
}
