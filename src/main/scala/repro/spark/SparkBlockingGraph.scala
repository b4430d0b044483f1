package repro.spark

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** Distributed Blocking Graph construction (Sec. 3.2): edges and their ARCS
  * weights computed with a token self-join + aggregation across partitions —
  * the Meta-blocking dataflow the equality-based progressive methods rely on.
  */
object SparkBlockingGraph {

  /** Weighted edges `(i, j, weight, lecobi)` of the Blocking Graph.
    *
    * The self-join of the filtered index on `token` yields one row per
    * (pair, shared block); the per-pair aggregation sums the ARCS
    * contributions `1/||b||` and records the Least Common Block Index — the
    * smallest shared `block_id` — so consumers can both weight and
    * deduplicate comparisons without any further pass.
    *
    * Pair validity: `i < j`, and cross-source for Clean-clean ER.
    */
  def arcsEdges(filteredIndex: DataFrame, orderedStats: DataFrame, cleanClean: Boolean): DataFrame = {
    val idx = filteredIndex.join(
      orderedStats.select("token", "cardinality", "block_id"), "token")
    val a = idx.select(
      col("token"),
      col("profile_id").as("ia"), col("source").as("sa"),
      col("cardinality"), col("block_id"))
    val b = idx.select(
      col("token"),
      col("profile_id").as("ib"), col("source").as("sb"))
    val pairCond =
      if (cleanClean) col("sa") =!= col("sb") else lit(true)
    a.join(b, Seq("token"))
      .filter(col("ia") < col("ib") && pairCond)
      .groupBy(col("ia").as("i"), col("ib").as("j"))
      .agg(
        sum(lit(1.0) / col("cardinality")).as("weight"),
        min(col("block_id")).as("lecobi"))
  }

  /** The distributed PBS comparison order (Sec. 5.2.1): every comparison
    * materialized from its least common block, blocks processed in
    * non-decreasing cardinality, descending edge weight inside a block —
    * i.e. a global sort by (lecobi, −weight, i, j).
    */
  def pbsOrder(edges: DataFrame): DataFrame =
    edges.orderBy(col("lecobi").asc, col("weight").desc, col("i").asc, col("j").asc)
}
