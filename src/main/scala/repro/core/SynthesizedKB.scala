package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

import repro.kb.KBIndex
import repro.lake.LakeSchema

/** The synthesized-KB index built from the lake itself (Sec. 5, Sec. 7.2).
  *
  * Synthesized annotations are lake column (pair) identities: column `c`
  * "inherits" the synthesized type of column `c_j` with confidence
  * |c ∩ c_j| / |c| (Eq. 5), and column pair (c_i,c_j) inherits the synthesized
  * relationship of (d_i,d_j) with confidence
  * |(c_i,c_j) ∩ (d_i,d_j)| / |(c_i,c_j)| (Eq. 6). Only column pairs forming a
  * unary FD get synthesized relationships, and — when an existing KB is in
  * play — only value pairs *not found in the KB relationship dictionary* are
  * stored (Sec. 7.2), so the synthesized KB compensates for, rather than
  * duplicates, KB coverage.
  *
  * @param synCS      (table_id, col_id, annotation, conf) — annotation is a
  *                   lake column key "table#col" (self rows have conf 1)
  * @param synRS      (table_id, col_a, col_b, annotation, conf) — annotation
  *                   is a lake pair key "table#ca#cb" (self rows have conf 1)
  * @param colVals    lake distinct (table_id, col_id, value) — retained so the
  *                   query phase can annotate query columns by overlap
  * @param colSizes   (table_id, col_id, n_distinct)
  * @param fdPairVals stored value pairs of FD column pairs (post KB exclusion)
  * @param pairSizes  (table_id, col_a, col_b, n_pairs) — total distinct value
  *                   pairs per FD pair (the Eq. 6 denominator, pre-exclusion)
  */
final case class SynthIndex(
    synCS: DataFrame,
    synRS: DataFrame,
    colVals: DataFrame,
    colSizes: DataFrame,
    fdPairVals: DataFrame,
    pairSizes: DataFrame) {

  def materialize(): this.type = {
    Seq(synCS, synRS, colVals, colSizes, fdPairVals, pairSizes).foreach { df =>
      df.persist(); val _ = df.count()
    }
    this
  }

  def unpersistAll(): Unit =
    Seq(synCS, synRS, colVals, colSizes, fdPairVals, pairSizes).foreach(_.unpersist())
}

object SynthesizedKB {

  /** Key of a lake column, used as a synthesized type annotation. */
  def colKey(table: org.apache.spark.sql.Column, colId: org.apache.spark.sql.Column) =
    concat_ws("#", table, colId)

  /** Key of a lake column pair, used as a synthesized relationship annotation. */
  def pairKey(table: org.apache.spark.sql.Column,
              a: org.apache.spark.sql.Column, b: org.apache.spark.sql.Column) =
    concat_ws("#", table, a, b)

  /** Builds the synthesized KB over the lake.
    *
    * @param cells     lake cells
    * @param excludeKb when SANTOS runs with an existing KB, its index; value
    *                  pairs found in the KB relationship dictionary are then
    *                  not stored in the synthesized relationship dictionary
    * @param maxValueSpread guard against quadratic blow-up on ubiquitous
    *                  values: a value occurring in more than this many columns
    *                  is skipped in the overlap join (stopword-like values
    *                  carry no discriminating signal)
    */
  def build(cells: DataFrame, excludeKb: Option[KBIndex] = None,
            maxValueSpread: Int = 1000,
            precomputedPairs: Option[DataFrame] = None): SynthIndex = {
    val colVals = LakeSchema.distinctColumnValues(cells)
    val colSizes = colVals.groupBy("table_id", "col_id").agg(count(lit(1)).as("n_distinct"))

    // ---- synthesized type dictionary (Eq. 5) ----
    val spreadOk = colVals
      .groupBy("value").agg(count(lit(1)).as("n_cols"))
      .filter(col("n_cols") <= maxValueSpread)
      .select("value")
    val cv = colVals.join(spreadOk, Seq("value"), "left_semi")
    val a = cv.select(col("table_id").as("ta"), col("col_id").as("ca"), col("value"))
    val b = cv.select(col("table_id").as("tb"), col("col_id").as("cb"), col("value"))
    val overlaps = a.join(b, Seq("value"))
      .filter(col("ta") =!= col("tb") || col("ca") =!= col("cb"))
      .groupBy("ta", "ca", "tb", "cb")
      .agg(count(lit(1)).as("n_ov"))
    val crossCS = overlaps
      .join(colSizes.withColumnRenamed("table_id", "ta_s").withColumnRenamed("col_id", "ca_s"),
            col("ta") === col("ta_s") && col("ca") === col("ca_s"))
      .select(col("ta").as("table_id"), col("ca").as("col_id"),
              colKey(col("tb"), col("cb")).as("annotation"),
              (col("n_ov") / col("n_distinct")).as("conf"))
    val selfCS = colSizes.select(
      col("table_id"), col("col_id"),
      colKey(col("table_id"), col("col_id")).as("annotation"),
      lit(1.0).as("conf"))
    val synCS = selfCS.union(crossCS)

    // ---- synthesized relationship dictionary (Eq. 6, Sec. 7.2) ----
    val allPairs = precomputedPairs.getOrElse(LakeSchema.valuePairs(cells))
    val fdPairs = FDDiscovery.meaningfulPairs(FDDiscovery.unaryFds(allPairs))
    val fdVals = allPairs.join(fdPairs, Seq("table_id", "col_a", "col_b"), "left_semi")
    // Eq. 6 denominator: total pairs of the column pair (before KB exclusion).
    val pairSizes = fdVals.groupBy("table_id", "col_a", "col_b")
      .agg(count(lit(1)).as("n_pairs"))
    // Store only pairs the existing KB does not already explain.
    val kept = excludeKb match {
      case Some(kb) =>
        val known = kb.relDict.select(
          col("label_subj").as("value_a"), col("label_obj").as("value_b")).distinct()
        fdVals.join(known, Seq("value_a", "value_b"), "left_anti")
      case None => fdVals
    }

    val pa = kept.select(col("table_id").as("ta"), col("col_a").as("caa"),
                         col("col_b").as("cab"), col("value_a"), col("value_b"))
    val pb = kept.select(col("table_id").as("tb"), col("col_a").as("cba"),
                         col("col_b").as("cbb"), col("value_a"), col("value_b"))
    val pairOverlaps = pa.join(pb, Seq("value_a", "value_b"))
      .filter(col("ta") =!= col("tb") || col("caa") =!= col("cba") || col("cab") =!= col("cbb"))
      .groupBy("ta", "caa", "cab", "tb", "cba", "cbb")
      .agg(count(lit(1)).as("n_ov"))
    val crossRS = pairOverlaps
      .join(pairSizes.select(col("table_id").as("ta_s"), col("col_a").as("caa_s"),
                             col("col_b").as("cab_s"), col("n_pairs")),
            col("ta") === col("ta_s") && col("caa") === col("caa_s") && col("cab") === col("cab_s"))
      .select(col("ta").as("table_id"), col("caa").as("col_a"), col("cab").as("col_b"),
              pairKey(col("tb"), col("cba"), col("cbb")).as("annotation"),
              (col("n_ov") / col("n_pairs")).as("conf"))
    val selfRS = kept.select("table_id", "col_a", "col_b").distinct()
      .select(col("table_id"), col("col_a"), col("col_b"),
              pairKey(col("table_id"), col("col_a"), col("col_b")).as("annotation"),
              lit(1.0).as("conf"))
    val synRS = selfRS.union(crossRS)

    SynthIndex(synCS, synRS, colVals, colSizes, kept, pairSizes)
  }

  /** Per-value-pair type scores of the Synthesized Relationship Dictionary
    * (Fig. 5 / Ex. 19): every value pair of column pair P carries annotation
    * P' with score overlap(P,P')/|P| (1 when P' = P). Used to validate the
    * dictionary against the paper's worked example; the search path consumes
    * the column-pair-level Eq. 6 scores in [[SynthIndex.synRS]].
    *
    * Output: (value_a, value_b, annotation, score).
    */
  def valuePairScores(index: SynthIndex): DataFrame = {
    index.fdPairVals
      .join(index.synRS, Seq("table_id", "col_a", "col_b"))
      .groupBy("value_a", "value_b", "annotation")
      .agg(max(col("conf")).as("score"))
  }
}
