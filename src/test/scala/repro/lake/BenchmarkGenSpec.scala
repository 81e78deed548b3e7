package repro.lake

import org.apache.spark.sql.functions._
import repro.SparkSpec
import repro.kb.World
import repro.lake.BenchmarkGen._

/** Benchmark generation: shapes, ground truth, coverage control, overlap. */
class BenchmarkGenSpec extends SparkSpec {

  lazy val world = new World(42L)

  private def microSpecs = Seq(
    DomainSpec("parks", Some("park"), Seq(
      SubjectCol("park_name"), PropCol("city", "locatedin"),
      NumCol("area", 1, 10)),
      nSubjects = 60, nPartitions = 5, kbCoverage = 0.8, isQuery = true),
    DomainSpec("codes", None, Seq(
      SubjectCol("code"), LocalPropCol("office", 10)),
      nSubjects = 60, nPartitions = 4, kbCoverage = 0.0, isQuery = false),
  )

  lazy val micro = BenchmarkGen.generate(spark, world, "MICRO", k = 3,
    microSpecs, queriesPerDomain = 2, seed = 11L)

  test("table and query counts follow the specs") {
    assert(micro.nLakeTables === 9)
    assert(micro.queries.size === 2)
    assert(micro.nQueryTables === 2)
  }

  test("ground truth is the query's domain") {
    micro.queries.foreach { q =>
      val gt = micro.groundTruth(q.tableId)
      assert(gt.size === 5)
      assert(gt.forall(_.startsWith("parks__")))
      assert(gt.contains(q.tableId))
    }
  }

  test("query tables keep all master columns (full copies)") {
    val q = micro.queries.head.tableId
    val nCols = micro.queryCells.filter(col("table_id") === q)
      .select("col_id").distinct().count()
    assert(nCols === 3)
  }

  test("the intent column holds the subject values") {
    val q = micro.queries.head
    val vals = micro.queryCells
      .filter(col("table_id") === q.tableId && col("col_id") === q.intentCol)
      .select("value").collect().map(_.getString(0))
    assert(vals.forall(_.contains("park")))
  }

  test("query cells are a subset of lake cells") {
    assert(micro.queryCells.exceptAll(micro.lakeCells).count() === 0)
  }

  test("every partition keeps the subject plus at least one string property") {
    val strCols = micro.lakeCells.filter(col("is_string"))
      .select("table_id", "col_id").distinct()
      .groupBy("table_id").count().collect()
    strCols.foreach(r => assert(r.getLong(1) >= 2, s"table ${r.getString(0)}"))
  }

  test("horizontal partitions of a domain overlap in rows") {
    val parks = micro.lakeCells
      .filter(col("table_id").startsWith("parks") && col("col_id") === 0)
      .select("table_id", "value").distinct().collect()
      .groupBy(_.getString(0)).view.mapValues(_.map(_.getString(1)).toSet).toMap
    val tables = parks.keys.toSeq.sorted
    val inter = parks(tables(0)).intersect(parks(tables(1)))
    assert(inter.nonEmpty, "expected overlapping horizontal samples")
    assert(parks(tables(0)) !== parks(tables(1)), "partitions should differ")
  }

  test("kbCoverage renames a consistent fraction of entity labels") {
    val worldLabels = world.entities.map(_.label).toSet
    val parkVals = micro.lakeCells
      .filter(col("table_id").startsWith("parks") && col("col_id") === 0)
      .select(lower(trim(col("value")))).distinct()
      .collect().map(_.getString(0))
    val covered = parkVals.count(worldLabels.contains).toDouble / parkVals.length
    assert(covered > 0.6 && covered < 0.95, s"coverage was $covered")
  }

  test("zero-coverage domains share no labels with the KB") {
    val worldLabels = world.entities.map(_.label).toSet
    val codeVals = micro.lakeCells
      .filter(col("table_id").startsWith("codes") && col("is_string"))
      .select(lower(trim(col("value")))).distinct()
      .collect().map(_.getString(0))
    assert(codeVals.nonEmpty)
    assert(codeVals.forall(v => !worldLabels.contains(v)))
  }

  test("local property columns are functionally dependent on the subject") {
    val codes = micro.lakeCells.filter(col("table_id").startsWith("codes"))
    val fds = repro.core.FDDiscovery.unaryFds(LakeSchema.valuePairs(codes))
      .filter(col("col_det") === 0).count()
    assert(fds >= 4) // subject determines office in every codes partition
  }

  test("generation is deterministic in the seed") {
    val again = BenchmarkGen.generate(spark, world, "MICRO", k = 3,
      microSpecs, queriesPerDomain = 2, seed = 11L)
    assert(again.nLakeRows === micro.nLakeRows)
    assert(again.lakeCells.exceptAll(micro.lakeCells).count() === 0)
  }

  test("different seeds give different lakes") {
    val other = BenchmarkGen.generate(spark, world, "MICRO", k = 3,
      microSpecs, queriesPerDomain = 2, seed = 12L)
    assert(other.lakeCells.exceptAll(micro.lakeCells).count() > 0)
  }

  test("the first column of a domain must be the subject") {
    assertThrows[IllegalArgumentException] {
      DomainSpec("bad", Some("park"), Seq(PropCol("city", "locatedin")),
        nSubjects = 10, nPartitions = 2, kbCoverage = 1.0, isQuery = false)
    }
  }

  // ----------------------------------------------------- paper-scale configs

  test("TUS-lite shape: 142 tables, 18 queries, >= k tables per query domain") {
    val b = BenchmarkGen.tus(spark, world)
    assert(b.nLakeTables === 142)
    assert(b.queries.size === 18)
    assert(b.k === 10)
    b.queries.foreach(q => assert(b.groundTruth(q.tableId).size >= b.k))
  }

  test("SMALL-lite shape: 99 tables, 14 queries, zero-coverage query domains") {
    val b = BenchmarkGen.small(spark, world)
    assert(b.nLakeTables === 99)
    assert(b.queries.size === 14)
    assert(b.k === 5)
    val zeroCov = b.queries.count(q =>
      q.tableId.startsWith("programs") || q.tableId.startsWith("sensors") ||
      q.tableId.startsWith("grants"))
    assert(zeroCov === 6)
  }

  test("LARGE-lite shape: 280 tables, 24 queries") {
    val b = BenchmarkGen.large(spark, world)
    assert(b.nLakeTables === 280)
    assert(b.queries.size === 24)
    assert(b.k === 10)
    b.queries.foreach(q => assert(b.groundTruth(q.tableId).size >= b.k))
  }

  test("benchmarks contain trap domains with clean names") {
    val b = BenchmarkGen.tus(spark, world)
    val trapTables = b.lakeCells.filter(col("table_id").startsWith("places"))
      .select("table_id").distinct().count()
    assert(trapTables === 10)
    // Trap column names stay informative (low name noise): nearly every
    // places partition names its (always kept) subject column "city...".
    val named = b.lakeCells
      .filter(col("table_id").startsWith("places") && col("col_name").contains("city"))
      .select("table_id").distinct().count()
    assert(named >= 8, s"only $named of 10 places tables kept a 'city' column name")
  }
}
