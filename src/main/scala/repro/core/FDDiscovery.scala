package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** Unary functional-dependency discovery over every string-column pair of
  * every table (the FDEP [12] bottom-up variant the paper uses, Sec. 7.2:
  * consider all pairwise relationships, then check whether each satisfies an
  * FD). As a dataflow this is one aggregation over the distinct value pairs:
  * `col_a -> col_b` holds in a table iff no value of `col_a` co-occurs with
  * two distinct values of `col_b`.
  */
object FDDiscovery {

  /** All unary FDs: (table_id, col_det, col_dep) with col_det -> col_dep.
    *
    * @param valuePairs distinct ordered value pairs per column pair, as
    *                   produced by [[repro.lake.LakeSchema.valuePairs]]
    */
  def unaryFds(valuePairs: DataFrame): DataFrame = {
    valuePairs
      .groupBy("table_id", "col_a", "col_b", "value_a")
      .agg(countDistinct(col("value_b")).as("n_dep"))
      .groupBy("table_id", "col_a", "col_b")
      .agg(max(col("n_dep")).as("max_dep"))
      .filter(col("max_dep") === 1)
      .select(col("table_id"), col("col_a").as("col_det"), col("col_b").as("col_dep"))
  }

  /** Ordered column pairs qualifying for a synthesized relationship: the FD
    * holds in at least one direction (the paper keeps column pairs "in a
    * functional dependency"). Both orientations of a qualifying pair are
    * emitted, consistent with [[repro.lake.LakeSchema.valuePairs]].
    */
  def meaningfulPairs(fds: DataFrame): DataFrame = {
    val fwd = fds.select(col("table_id"), col("col_det").as("col_a"), col("col_dep").as("col_b"))
    val bwd = fds.select(col("table_id"), col("col_dep").as("col_a"), col("col_det").as("col_b"))
    fwd.union(bwd).distinct()
  }
}
