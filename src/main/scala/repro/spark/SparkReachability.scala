package repro.spark

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** Distributed reachability over an edge DataFrame (src, dst) by iterative
  * frontier expansion — the influence-spread oracle f_t(S) as a Spark job.
  *
  * Used to cross-validate the local bitset BFS oracle (and the DuckDB
  * recursive-CTE oracle) and to evaluate seed sets on graphs too large for a
  * single driver structure. Lineage is truncated every iteration with
  * `localCheckpoint` so the plan stays bounded.
  */
object SparkReachability {

  /** Nodes reachable from `seeds` (seeds included), as a single-column
    * DataFrame `node`.
    */
  def reachable(
      spark: SparkSession,
      edges: DataFrame,
      seeds: Seq[Int],
      maxIter: Int = 1000,
  ): DataFrame = {
    import spark.implicits._
    val e = edges.select(col("src").cast("int"), col("dst").cast("int")).distinct().cache()
    var visited = seeds.distinct.toDF("node").localCheckpoint()
    var frontier = visited
    var iter = 0
    var grew = true
    while (grew && iter < maxIter) {
      val next = frontier
        .join(e, frontier("node") === e("src"))
        .select(e("dst").as("node"))
        .distinct()
        .except(visited)
        .localCheckpoint()
      val n = next.count()
      if (n == 0) grew = false
      else {
        visited = visited.union(next).localCheckpoint()
        frontier = next
      }
      iter += 1
    }
    e.unpersist()
    visited
  }

  /** f_t(S) = |reachable(S)| computed distributedly. */
  def spread(spark: SparkSession, edges: DataFrame, seeds: Seq[Int]): Long =
    reachable(spark, edges, seeds).count()
}
