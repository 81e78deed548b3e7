package repro.core

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}
import repro.kb.KBIndex
import repro.lake.LakeSchema
import repro.lake.LakeSchema.TableData

/** KB column semantics (Sec. 4.1–4.2), pinned to the paper's Examples 12–15
  * on the Birthplace fixture and oracle-checked against DuckDB.
  */
class ColumnSemanticsSpec extends SparkSpec {

  lazy val kb: KBIndex = PaperFixtures.birthplaceKb(spark)
  lazy val people = PaperFixtures.peopleTable(spark)

  private def csOf(colId: Int, isQuery: Boolean = false): Map[String, (Double, Double, Double)] =
    ColumnSemantics.compute(people, kb, isQuery)
      .filter(col("table_id") === "people" && col("col_id") === colId)
      .collect()
      .map(r => r.getAs[String]("annotation") ->
        ((r.getAs[Double]("fs"), r.getAs[Double]("gs"), r.getAs[Double]("conf"))))
      .toMap

  test("Ex. 12: CS(Birthplace) is {place, adminarea, city, state}") {
    assert(csOf(1).keySet === Set("place", "adminarea", "city", "state"))
  }

  test("Ex. 13: frequency scores fs(city)=0.6, fs(state)=0.2, fs(place)=1.0") {
    val cs = csOf(1)
    assert(math.abs(cs("city")._1 - 0.6) < 1e-9)
    assert(math.abs(cs("state")._1 - 0.2) < 1e-9)
    assert(math.abs(cs("place")._1 - 1.0) < 1e-9)
    assert(math.abs(cs("adminarea")._1 - 1.0) < 1e-9)
  }

  test("Ex. 15: lake-table confidences are fs * gs") {
    val cs = csOf(1)
    assert(math.abs(cs("place")._3 - 1.0 * 0.14) < 1e-9)
    assert(math.abs(cs("adminarea")._3 - 1.0 * 0.17) < 1e-9)
    assert(math.abs(cs("city")._3 - 0.6 * 0.22) < 1e-9)
    assert(math.abs(cs("state")._3 - 0.2 * 0.35) < 1e-9)
  }

  test("Eq. 3: query tables skip the gs penalty") {
    val cs = csOf(1, isQuery = true)
    assert(math.abs(cs("city")._3 - 0.6) < 1e-9)
    assert(math.abs(cs("place")._3 - 1.0) < 1e-9)
  }

  test("semantic consistency: the creativework branch of Boston is discarded") {
    val cs = csOf(1)
    assert(!cs.contains("musicalbum"))
    assert(!cs.contains("creativework"))
  }

  test("Person column maps to person with fs 1.0") {
    val cs = csOf(0)
    assert(cs.keySet === Set("person"))
    assert(math.abs(cs("person")._1 - 1.0) < 1e-9)
    assert(math.abs(cs("person")._3 - 1.0 * 0.20) < 1e-9)
  }

  test("columns with no KB-mapped value get empty CS") {
    val cells = LakeSchema.cellsOf(spark, Seq(
      TableData("x", Seq("mystery"), Seq(true), Seq(Seq("zzz1"), Seq("zzz2")))))
    assert(ColumnSemantics.compute(cells, kb, isQuery = false).count() === 0)
  }

  test("unmapped values do not dilute fs (denominator is KB-mapped values)") {
    val cells = LakeSchema.cellsOf(spark, Seq(
      TableData("x", Seq("c"), Seq(true),
        Seq(Seq("boston"), Seq("dallas"), Seq("zzz-not-in-kb")))))
    val cs = ColumnSemantics.compute(cells, kb, isQuery = false)
      .filter(col("annotation") === "city").head()
    assert(math.abs(cs.getAs[Double]("fs") - 1.0) < 1e-9) // 2 of 2 mapped values
  }

  test("numeric columns are excluded") {
    val cells = LakeSchema.cellsOf(spark, Seq(
      TableData("x", Seq("n"), Seq(false), Seq(Seq("boston")))))
    assert(ColumnSemantics.compute(cells, kb, isQuery = false).count() === 0)
  }

  test("top-level tie on a homograph resolves to the rarer top level") {
    // boston is both city and album; with 1 boston and no other place values,
    // place (6M) vs creativework (7M): tie on 1 value -> rarer top level wins,
    // which is place.
    val cells = LakeSchema.cellsOf(spark, Seq(
      TableData("x", Seq("c"), Seq(true), Seq(Seq("boston")))))
    val tops = ColumnSemantics.compute(cells, kb, isQuery = false)
      .select("top_level").distinct().collect().map(_.getString(0)).toSet
    assert(tops === Set("place"))
  }

  test("normalization: mixed-case and padded values still map") {
    val cells = LakeSchema.cellsOf(spark, Seq(
      TableData("x", Seq("c"), Seq(true), Seq(Seq("  BOSTON "), Seq("Dallas")))))
    val cs = ColumnSemantics.compute(cells, kb, isQuery = false)
      .filter(col("annotation") === "city").head()
    assert(math.abs(cs.getAs[Double]("fs") - 1.0) < 1e-9)
  }

  test("duplicate values count once (fs is over unique values)") {
    val cells = LakeSchema.cellsOf(spark, Seq(
      TableData("x", Seq("c"), Seq(true),
        Seq(Seq("boston"), Seq("boston"), Seq("boston"), Seq("texas")))))
    val cs = ColumnSemantics.compute(cells, kb, isQuery = false)
      .filter(col("annotation") === "city").head()
    assert(math.abs(cs.getAs[Double]("fs") - 0.5) < 1e-9) // 1 of 2 unique
  }

  test("fs matches a DuckDB computation of Eq. 1") {
    val got = ColumnSemantics.compute(people, kb, isQuery = false)
      .filter(col("top_level") === "place")
      .select(col("annotation"), format_number(col("fs"), 4).as("fs"))
    Oracle.assertEquivalent(got,
      """WITH vals AS (
        |  SELECT DISTINCT lower(trim(value)) AS v
        |  FROM cells WHERE col_id = '1' AND is_string = 'true'
        |), mapped AS (
        |  SELECT DISTINCT t.type_id, v.v
        |  FROM vals v JOIN typedict t ON t.label = v.v
        |  WHERE t.top_level = 'place'
        |), denom AS (SELECT COUNT(*) AS n FROM vals)
        |SELECT m.type_id AS annotation,
        |       printf('%.4f', COUNT(*) / (SELECT n FROM denom)) AS fs
        |FROM mapped m GROUP BY m.type_id""".stripMargin,
      "cells" -> people, "typedict" -> kb.typeDict)
  }
}
