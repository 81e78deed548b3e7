package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

import repro.lake.LakeSchema

/** Semantic annotation of query tables (the online half of Fig. 4).
  *
  * Query CS from the KB uses fs only (Eq. 3, second case — the gs penalty is
  * applied once, on the lake side). Query annotations from the synthesized KB
  * are overlaps against *lake* columns / lake FD column pairs, so they share
  * the lake's annotation vocabulary and match through the inverted indexes.
  */
final case class QueryAnnotation(
    kbCS: Option[DataFrame],  // (table_id, col_id, annotation, fs, gs, conf)
    kbRS: Option[DataFrame],  // (table_id, col_a, col_b, predicate, conf)
    synCS: Option[DataFrame], // (table_id, col_id, annotation, conf)
    synRS: Option[DataFrame]) // (table_id, col_a, col_b, annotation, conf)

/** The query semantic tree (Sec. 3): BFS edges (parent, child) rooted at the
  * intent column, over columns connected by any non-empty RS.
  */
final case class QueryTree(tableId: String, intentCol: Int, edges: Seq[(Int, Int)])

object QueryAnnotator {

  /** Annotates all query tables in one pass against the lake index. */
  def annotate(queryCells: DataFrame, index: LakeIndex): QueryAnnotation = {
    val kbCS = index.kb.map(kb => ColumnSemantics.compute(queryCells, kb, isQuery = true))
    val kbRS = for (kb <- index.kb; cs <- kbCS)
      yield RelationshipSemantics.compute(queryCells, kb, cs)

    val synCS = index.synth.map { s =>
      val qVals = LakeSchema.distinctColumnValues(queryCells)
      val qSizes = qVals.groupBy("table_id", "col_id").agg(count(lit(1)).as("n_q"))
      val lake = s.colVals.select(
        col("table_id").as("lt"), col("col_id").as("lc"), col("value"))
      qVals.join(lake, Seq("value"))
        .groupBy("table_id", "col_id", "lt", "lc")
        .agg(count(lit(1)).as("n_ov"))
        .join(qSizes, Seq("table_id", "col_id"))
        .select(col("table_id"), col("col_id"),
                SynthesizedKB.colKey(col("lt"), col("lc")).as("annotation"),
                (col("n_ov") / col("n_q")).as("conf"))
    }

    val synRS = index.synth.map { s =>
      val qPairs = LakeSchema.valuePairs(queryCells)
      val qSizes = qPairs.groupBy("table_id", "col_a", "col_b")
        .agg(count(lit(1)).as("n_q"))
      val lake = s.fdPairVals.select(
        col("table_id").as("lt"), col("col_a").as("la"), col("col_b").as("lb"),
        col("value_a"), col("value_b"))
      qPairs.join(lake, Seq("value_a", "value_b"))
        .groupBy("table_id", "col_a", "col_b", "lt", "la", "lb")
        .agg(count(lit(1)).as("n_ov"))
        .join(qSizes, Seq("table_id", "col_a", "col_b"))
        .select(col("table_id"), col("col_a"), col("col_b"),
                SynthesizedKB.pairKey(col("lt"), col("la"), col("lb")).as("annotation"),
                (col("n_ov") / col("n_q")).as("conf"))
    }

    QueryAnnotation(kbCS, kbRS, synCS, synRS)
  }

  /** Builds the query semantic tree for each (query table, intent column):
    * BFS from the intent column over the undirected graph whose edges are
    * column pairs with non-empty RS from either method. Children are visited
    * in ascending column order for determinism.
    */
  def queryTrees(ann: QueryAnnotation, intents: Map[String, Int]): Seq[QueryTree] = {
    val rsEdges: Seq[(String, Int, Int)] =
      (ann.kbRS.toSeq ++ ann.synRS.toSeq).flatMap { df =>
        df.select("table_id", "col_a", "col_b").distinct().collect().map { r =>
          (r.getString(0), r.getInt(1), r.getInt(2))
        }
      }
    val byTable: Map[String, Seq[(Int, Int)]] =
      rsEdges.groupBy(_._1).map { case (t, xs) => t -> xs.map(x => (x._2, x._3)) }

    intents.toSeq.sortBy(_._1).map { case (tableId, intent) =>
      val adj: Map[Int, Seq[Int]] = byTable.getOrElse(tableId, Seq.empty)
        .flatMap { case (a, b) => Seq(a -> b, b -> a) }
        .groupBy(_._1).map { case (c, xs) => c -> xs.map(_._2).distinct.sorted }
      val visited = scala.collection.mutable.Set(intent)
      val edges = scala.collection.mutable.ListBuffer[(Int, Int)]()
      val queue = scala.collection.mutable.Queue(intent)
      while (queue.nonEmpty) {
        val u = queue.dequeue()
        for (v <- adj.getOrElse(u, Seq.empty) if !visited.contains(v)) {
          visited += v
          edges += ((u, v))
          queue.enqueue(v)
        }
      }
      QueryTree(tableId, intent, edges.toList)
    }
  }
}
