package repro.spark

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** IC-model diffusion probabilities as a Spark aggregation (§V-C):
  * x interactions from u to v ⇒ p_uv = 2/(1 + e^{−0.2x}) − 1.
  *
  * This is the Spark-side twin of [[repro.ic.IcGraph.fromCounts]]; tests check
  * the two agree and DuckDB replays the same SQL.
  */
object InfluenceProbabilities {

  /** From raw interactions (src, dst[, ...]) to (src, dst, x, p). */
  def fromInteractions(interactions: DataFrame): DataFrame =
    interactions
      .groupBy(col("src"), col("dst"))
      .agg(count(lit(1)).as("x"))
      .withColumn("p", lit(2.0) / (lit(1.0) + exp(lit(-0.2) * col("x"))) - lit(1.0))
}
