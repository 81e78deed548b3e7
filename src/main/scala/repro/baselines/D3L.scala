package repro.baselines

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

import repro.core.UnionSearch.Ranked
import repro.lake.LakeSchema

/** D³L-style column-unionability baseline (Bogatu et al. [3], Sec. 8.1).
  *
  * D³L judges relatedness per *column* using five evidence types — attribute
  * names, value overlap, format (regular-expression) patterns, word
  * embeddings, and numeric domain distributions — with no notion of
  * relationships between columns. We reproduce the five evidences exactly in
  * spirit:
  *
  *  - name: Jaccard over character 3-grams of column names;
  *  - values: exact Jaccard over distinct normalized values (computed as a
  *    distributed join — D³L approximates this with LSH);
  *  - formats: weighted Jaccard over regex-class pattern histograms;
  *  - embeddings: cosine of mean hashed character-trigram vectors (a
  *    deterministic stand-in for fastText — see DESIGN.md substitutions);
  *  - distribution: numeric-column decile-profile similarity.
  *
  * A candidate table's score is the mean over query columns of their best
  * column match, mirroring D³L's aggregation; top-k tables win.
  */
object D3L {

  private val EmbDim = 48
  private val MaxSampleValues = 100

  /** Per-column signature (driver-side; the lake has few thousand columns). */
  final case class ColSig(
      table: String, colId: Int, name: String, isString: Boolean,
      patterns: Map[String, Double], emb: Array[Double], deciles: Array[Double])

  /** Regex-class pattern of a value: letter runs → 'a', digit runs → '9'. */
  def pattern(v: String): String = {
    val sb = new StringBuilder
    var last = ' '
    v.foreach { ch =>
      val cls = if (ch.isLetter) 'a' else if (ch.isDigit) '9' else ch
      if (cls != last || (cls != 'a' && cls != '9')) sb += cls
      last = cls
    }
    sb.toString
  }

  /** Deterministic hashed character-trigram vector, L2-normalized. */
  def trigramVector(v: String): Array[Double] = {
    val arr = new Array[Double](EmbDim)
    val s = s"^$v$$"
    for (i <- 0 until math.max(1, s.length - 2)) {
      val tri = s.substring(i, math.min(s.length, i + 3))
      val h = scala.util.hashing.MurmurHash3.stringHash(tri)
      arr(math.floorMod(h, EmbDim)) += (if (h >= 0) 1.0 else -1.0)
    }
    val norm = math.sqrt(arr.map(x => x * x).sum)
    if (norm > 0) arr.map(_ / norm) else arr
  }

  def cosine(a: Array[Double], b: Array[Double]): Double = {
    val d = a.zip(b).map { case (x, y) => x * y }.sum
    math.max(0.0, d) // negative similarity carries no unionability signal
  }

  def qgrams(s: String, q: Int = 3): Set[String] = {
    val p = s.toLowerCase
    if (p.length < q) Set(p) else (0 to p.length - q).map(i => p.substring(i, i + q)).toSet
  }

  def jaccard[A](a: Set[A], b: Set[A]): Double =
    if (a.isEmpty && b.isEmpty) 0.0 else a.intersect(b).size.toDouble / a.union(b).size

  def weightedJaccard(a: Map[String, Double], b: Map[String, Double]): Double = {
    val keys = a.keySet ++ b.keySet
    if (keys.isEmpty) return 0.0
    val mins = keys.toSeq.map(k => math.min(a.getOrElse(k, 0.0), b.getOrElse(k, 0.0))).sum
    val maxs = keys.toSeq.map(k => math.max(a.getOrElse(k, 0.0), b.getOrElse(k, 0.0))).sum
    if (maxs == 0) 0.0 else mins / maxs
  }

  def decileSimilarity(a: Array[Double], b: Array[Double]): Double = {
    if (a.isEmpty || b.isEmpty) return 0.0
    val scale = math.max(math.abs(a.last - a.head), math.abs(b.last - b.head)) max 1e-9
    val dist = a.zip(b).map { case (x, y) => math.abs(x - y) }.sum / a.length
    1.0 / (1.0 + dist / scale)
  }

  /** Computes all column signatures for the given cells with Spark
    * aggregations (value sampling, numeric deciles), finishing the small
    * per-column profile work on the driver.
    */
  def signatures(cells: DataFrame): Seq[ColSig] = {
    val profile = LakeSchema.columnProfile(cells).collect().map { r =>
      (r.getString(0), r.getInt(1), r.getString(2), r.getBoolean(3))
    }

    // Up to MaxSampleValues distinct values per string column.
    val sampled = LakeSchema.distinctColumnValues(cells)
      .groupBy("table_id", "col_id")
      .agg(slice(sort_array(collect_set(col("value"))), 1, MaxSampleValues).as("vals"))
      .collect()
      .map(r => ((r.getString(0), r.getInt(1)), r.getSeq[String](2)))
      .toMap

    // Decile profile per numeric column.
    val deciles = cells
      .filter(!col("is_string") && col("value").isNotNull)
      .withColumn("d", col("value").cast("double"))
      .filter(col("d").isNotNull)
      .groupBy("table_id", "col_id")
      .agg(expr("percentile_approx(d, array(0.1,0.2,0.3,0.4,0.5,0.6,0.7,0.8,0.9))").as("q"))
      .collect()
      .map(r => ((r.getString(0), r.getInt(1)), r.getSeq[Double](2).toArray))
      .toMap

    profile.toSeq.map { case (t, c, name, isStr) =>
      val vals = sampled.getOrElse((t, c), Seq.empty)
      val pats = vals.groupBy(pattern).map { case (p, xs) => p -> xs.size.toDouble / math.max(1, vals.size) }
      val emb =
        if (vals.isEmpty) new Array[Double](EmbDim)
        else {
          val sum = vals.map(trigramVector).transpose.map(_.sum).toArray
          val n = math.sqrt(sum.map(x => x * x).sum)
          if (n > 0) sum.map(_ / n) else sum
        }
      ColSig(t, c, name, isStr, pats, emb, deciles.getOrElse((t, c), Array.empty))
    }
  }

  /** Exact value-overlap Jaccard between query and lake string columns,
    * as a distributed join: (q_table, q_col, t_table, t_col, jaccard).
    */
  def valueJaccard(queryCells: DataFrame, lakeCells: DataFrame): DataFrame = {
    val qv = LakeSchema.distinctColumnValues(queryCells)
      .select(col("table_id").as("q_table"), col("col_id").as("q_col"), col("value"))
    val tv = LakeSchema.distinctColumnValues(lakeCells)
      .select(col("table_id").as("t_table"), col("col_id").as("t_col"), col("value"))
    val qSizes = qv.groupBy("q_table", "q_col").agg(count(lit(1)).as("n_q"))
    val tSizes = tv.groupBy("t_table", "t_col").agg(count(lit(1)).as("n_t"))
    qv.join(tv, Seq("value"))
      .groupBy("q_table", "q_col", "t_table", "t_col")
      .agg(count(lit(1)).as("n_ov"))
      .join(qSizes, Seq("q_table", "q_col"))
      .join(tSizes, Seq("t_table", "t_col"))
      .select(col("q_table"), col("q_col"), col("t_table"), col("t_col"),
              (col("n_ov") / (col("n_q") + col("n_t") - col("n_ov"))).as("jaccard"))
  }

  /** Mean of the applicable evidences for one column pair. */
  def columnScore(q: ColSig, t: ColSig, valueJac: Double): Double = {
    if (q.isString != t.isString) return 0.0
    val nameSim = jaccard(qgrams(q.name), qgrams(t.name))
    val evidences =
      if (q.isString)
        Seq(nameSim, valueJac, weightedJaccard(q.patterns, t.patterns), cosine(q.emb, t.emb))
      else
        Seq(nameSim, decileSimilarity(q.deciles, t.deciles))
    evidences.sum / evidences.size
  }

  /** The D³L index: lake signatures plus cached lake cells for the overlap
    * join (its five LSH indexes collapse to these two structures here).
    */
  final case class Index(lakeSigs: Seq[ColSig], lakeCells: DataFrame)

  def buildIndex(lakeCells: DataFrame): Index = {
    val sigs = signatures(lakeCells)
    Index(sigs, lakeCells)
  }

  /** Top-k search for every query table. */
  def search(queryCells: DataFrame, index: Index, queryIds: Seq[String], k: Int): Map[String, Seq[Ranked]] = {
    val qSigs = signatures(queryCells).filter(s => queryIds.contains(s.table))
    val jac: Map[(String, Int, String, Int), Double] =
      valueJaccard(queryCells, index.lakeCells).collect().map { r =>
        ((r.getString(0), r.getInt(1), r.getString(2), r.getInt(3)), r.getDouble(4))
      }.toMap

    val lakeByTable = index.lakeSigs.groupBy(_.table)
    queryIds.map { q =>
      val qCols = qSigs.filter(_.table == q)
      val ranked = lakeByTable.toSeq.map { case (t, tCols) =>
        val perQCol = qCols.map { qc =>
          tCols.map { tc =>
            columnScore(qc, tc, jac.getOrElse((qc.table, qc.colId, t, tc.colId), 0.0))
          }.foldLeft(0.0)(math.max)
        }
        val s = if (perQCol.isEmpty) 0.0 else perQCol.sum / perQCol.size
        Ranked(t, s)
      }
        .filter(_.score > 0.0)
        .sortBy(r => (-r.score, r.tableId))
        .take(k)
      q -> ranked
    }.toMap
  }
}
