package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** The SANTOS unionability scoring dataflow (Sec. 6).
  *
  * Per semantic-graph method G (KB or Synth):
  *
  *   colMatch_G(Q_c, T_c)  = max_a CS(Q_c,a) · CS(T_c,a)             (Eq. 7)
  *   relMatch_G(qe, te)    = max_p RS(qe,p) · RS(te,p)               (Eq. 8)
  *   pairMatch_G(qe, te)   = colMatch·relMatch·colMatch              (Eq. 9)
  *
  * and across methods, the KB branch wins iff its *gs-de-penalized* score is
  * at least the Synth score (Eq. 10) — but the winning KB branch keeps its
  * penalized value, so granular type matches still outrank top-level ones.
  *
  * All matches are DataFrame joins on the annotation — i.e. lookups in the
  * inverted indexes of the pre-processing phase.
  */
object Scoring {

  /** Eq. 7. Returns (q_table, q_col, t_table, t_col, col_match, gs_sel) where
    * gs_sel is the granularity score of the *selected* annotation (needed for
    * the Eq. 10 de-penalization; 1.0 for the synthesized method).
    */
  def colMatch(queryCS: DataFrame, lakeCS: DataFrame, withGs: Boolean): DataFrame = {
    val q = queryCS.select(
      col("table_id").as("q_table"), col("col_id").as("q_col"),
      col("annotation"), col("conf").as("q_conf"))
    val t = lakeCS.select(
      col("table_id").as("t_table"), col("col_id").as("t_col"),
      col("annotation"),
      col("conf").as("t_conf"),
      (if (withGs) col("gs") else lit(1.0)).as("gs_a"))
    q.join(t, Seq("annotation"))
      .groupBy("q_table", "q_col", "t_table", "t_col")
      .agg(max(struct((col("q_conf") * col("t_conf")).as("prod"),
                      col("gs_a").as("gs"),
                      col("annotation").as("ann"))).as("best"))
      .select(col("q_table"), col("q_col"), col("t_table"), col("t_col"),
              col("best.prod").as("col_match"), col("best.gs").as("gs_sel"))
  }

  /** Eq. 8 over ordered column pairs; annotation column name differs per
    * method ("predicate" for KB, "annotation" for Synth) — pass it in.
    */
  def relMatch(queryRS: DataFrame, lakeRS: DataFrame, annCol: String): DataFrame = {
    val q = queryRS.select(
      col("table_id").as("q_table"), col("col_a").as("q_a"), col("col_b").as("q_b"),
      col(annCol).as("ann"), col("conf").as("q_conf"))
    val t = lakeRS.select(
      col("table_id").as("t_table"), col("col_a").as("t_a"), col("col_b").as("t_b"),
      col(annCol).as("ann"), col("conf").as("t_conf"))
    q.join(t, Seq("ann"))
      .groupBy("q_table", "q_a", "q_b", "t_table", "t_a", "t_b")
      .agg(max(col("q_conf") * col("t_conf")).as("rel_match"))
  }

  /** Eq. 9: pairMatch for one method, with the Eq. 10 de-penalized companion.
    * Output: (q_table, q_a, q_b, t_table, t_a, t_b, pm, pm_depen).
    */
  def pairMatch(colM: DataFrame, relM: DataFrame): DataFrame = {
    val cm1 = colM.select(
      col("q_table"), col("q_col").as("q_a"), col("t_table"), col("t_col").as("t_a"),
      col("col_match").as("cm1"), col("gs_sel").as("gs1"))
    val cm2 = colM.select(
      col("q_table"), col("q_col").as("q_b"), col("t_table"), col("t_col").as("t_b"),
      col("col_match").as("cm2"), col("gs_sel").as("gs2"))
    relM
      .join(cm1, Seq("q_table", "q_a", "t_table", "t_a"))
      .join(cm2, Seq("q_table", "q_b", "t_table", "t_b"))
      .select(col("q_table"), col("q_a"), col("q_b"),
              col("t_table"), col("t_a"), col("t_b"),
              (col("cm1") * col("rel_match") * col("cm2")).as("pm"),
              (col("cm1") * col("rel_match") * col("cm2") / (col("gs1") * col("gs2")))
                .as("pm_depen"))
  }

  private val edgeKeys = Seq("q_table", "q_a", "q_b", "t_table", "t_a", "t_b")

  /** Eq. 10: inter-method selection. The KB branch is chosen iff
    * pm_KB/(gs1·gs2) >= pm_Synth; the *penalized* pm_KB is then kept.
    */
  def combine(pmKb: Option[DataFrame], pmSynth: Option[DataFrame]): DataFrame =
    (pmKb, pmSynth) match {
      case (Some(kb), None) => kb.select((edgeKeys.map(col) :+ col("pm")): _*)
      case (None, Some(sy)) => sy.select((edgeKeys.map(col) :+ col("pm")): _*)
      case (Some(kb), Some(sy)) =>
        val k = kb.select((edgeKeys.map(col) :+ col("pm").as("pm_kb") :+
                           col("pm_depen").as("pm_kb_depen")): _*)
        val s = sy.select((edgeKeys.map(col) :+ col("pm").as("pm_sy")): _*)
        k.join(s, edgeKeys, "full_outer")
          .select((edgeKeys.map(col) :+
            when(coalesce(col("pm_kb_depen"), lit(-1.0)) >= coalesce(col("pm_sy"), lit(0.0)),
                 col("pm_kb"))
              .otherwise(col("pm_sy")).as("pm")): _*)
      case (None, None) =>
        throw new IllegalArgumentException("at least one method required")
    }

  /** Orientation closure: a tree edge (parent→child) mapped onto a lake edge
    * (a→b) may be witnessed in either orientation of the directed RS, so the
    * final score of ((q_a,q_b),(t_a,t_b)) is the max over both consistent
    * flips (Sec. 6: the KB may return RS(T_c1,T_c2) for the lake table and
    * RS(Q_c2,Q_c1) for the query table).
    */
  def orientMax(pm: DataFrame): DataFrame = {
    val flipped = pm.select(
      col("q_table"), col("q_b").as("q_a"), col("q_a").as("q_b"),
      col("t_table"), col("t_b").as("t_a"), col("t_a").as("t_b"),
      col("pm"))
    pm.select((edgeKeys.map(col) :+ col("pm")): _*)
      .union(flipped.select((edgeKeys.map(col) :+ col("pm")): _*))
      .groupBy(edgeKeys.map(col): _*)
      .agg(max(col("pm")).as("pm"))
  }

  /** Full edge-score pipeline for a query annotation against a lake index:
    * per-method colMatch/relMatch/pairMatch, inter-method combination, and
    * orientation closure. Output: (q_table, q_a, q_b, t_table, t_a, t_b, pm).
    */
  def edgeScores(ann: QueryAnnotation, index: LakeIndex): DataFrame = {
    val pmKb = for {
      qcs <- ann.kbCS; qrs <- ann.kbRS
      tcs <- index.kbCS; trs <- index.kbRS
    } yield {
      val cm = colMatch(qcs, tcs, withGs = true)
      val rm = relMatch(qrs, trs, "predicate")
      pairMatch(cm, rm)
    }
    val pmSy = for {
      qcs <- ann.synCS; qrs <- ann.synRS
      s <- index.synth
    } yield {
      val cm = colMatch(qcs, s.synCS, withGs = false)
      val rm = relMatch(qrs, s.synRS, "annotation")
      pairMatch(cm, rm)
    }
    orientMax(combine(pmKb, pmSy))
  }

  /** Column-only match scores (for the SANTOS_Col variant mentioned in
    * Sec. 8.2): best per-method colMatch per (query column, lake column).
    * Output: (q_table, q_col, t_table, t_col, col_match).
    */
  def columnOnlyScores(ann: QueryAnnotation, index: LakeIndex): DataFrame = {
    val parts = Seq(
      for (qcs <- ann.kbCS; tcs <- index.kbCS) yield colMatch(qcs, tcs, withGs = true),
      for (qcs <- ann.synCS; s <- index.synth) yield colMatch(qcs, s.synCS, withGs = false),
    ).flatten
    require(parts.nonEmpty, "at least one method required")
    parts
      .map(_.select(col("q_table"), col("q_col"), col("t_table"), col("t_col"), col("col_match")))
      .reduce(_ union _)
      .groupBy("q_table", "q_col", "t_table", "t_col")
      .agg(max(col("col_match")).as("col_match"))
  }
}
