package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._

import repro.kb.KBIndex
import repro.lake.LakeSchema

/** KB-based relationship semantics (Sec. 4.3).
  *
  * For every *ordered* pair of string columns (c_i, c_j) whose columns both
  * have non-empty CS, look up each distinct value pair in the KB relationship
  * dictionary and score predicates with
  *
  *   RS_CONF(c_i, p, c_j) = |(c_i,c_j)_p| / |(c_i,c_j)_KB|        (Eq. 4)
  *
  * where the denominator counts distinct value pairs with *both* values in the
  * KB. Only the maximum-scoring predicate is kept per ordered pair (ties go to
  * the predicate with the fewest KB pairs, footnote 4). Both orientations of a
  * column pair are computed, because KB predicates are directed and the paper
  * preserves RS(c1,c2) and RS(c2,c1) for lake tables.
  *
  * Output schema: (table_id, col_a, col_b, predicate, conf).
  */
object RelationshipSemantics {

  def compute(cells: DataFrame, kb: KBIndex, cs: DataFrame): DataFrame =
    computeFromPairs(LakeSchema.valuePairs(cells), kb, cs)

  /** Variant taking pre-computed value pairs (shared with other phases). */
  def computeFromPairs(valuePairs: DataFrame, kb: KBIndex, cs: DataFrame): DataFrame = {
    // Restrict to column pairs whose both sides have CS.
    val csCols = cs.select(col("table_id").as("t_c"), col("col_id").as("c_c")).distinct()
    val restricted = valuePairs
      .join(csCols, valuePairs("table_id") === col("t_c") &&
                    valuePairs("col_a") === col("c_c"), "left_semi")
      .join(csCols, valuePairs("table_id") === col("t_c") &&
                    valuePairs("col_b") === col("c_c"), "left_semi")

    // |(c_i,c_j)_KB|: distinct pairs with both values in the KB.
    val coveredA = kb.coveredLabels.select(col("label").as("lbl_a"))
    val coveredB = kb.coveredLabels.select(col("label").as("lbl_b"))
    val pairsKb = restricted
      .join(coveredA, col("value_a") === col("lbl_a"), "left_semi")
      .join(coveredB, col("value_b") === col("lbl_b"), "left_semi")
    val nKb = pairsKb
      .groupBy("table_id", "col_a", "col_b")
      .agg(count(lit(1)).as("n_kb")) // rows already distinct value pairs

    // |(c_i,c_j)_p|: distinct pairs carrying predicate p, subject on col_a.
    val withP = pairsKb
      .join(kb.relDict,
            col("value_a") === col("label_subj") && col("value_b") === col("label_obj"))
      .select(col("table_id"), col("col_a"), col("col_b"),
              col("value_a"), col("value_b"), col("predicate"), col("pred_pairs"))
      .distinct()
    val nP = withP
      .groupBy("table_id", "col_a", "col_b", "predicate", "pred_pairs")
      .agg(count(lit(1)).as("n_p"))

    val scored = nP
      .join(nKb, Seq("table_id", "col_a", "col_b"))
      .withColumn("conf", col("n_p") / col("n_kb"))

    // Keep only the max-scoring predicate; rarer predicate wins ties.
    val w = Window.partitionBy("table_id", "col_a", "col_b")
      .orderBy(col("conf").desc, col("pred_pairs").asc, col("predicate").asc)
    scored
      .withColumn("rk", row_number().over(w))
      .filter(col("rk") === 1)
      .select("table_id", "col_a", "col_b", "predicate", "conf")
  }
}
