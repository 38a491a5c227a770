package repro.spark

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec, TestData}

class SparkReachabilitySpec extends SparkSpec {

  private val reachSql =
    """WITH RECURSIVE r(node) AS (
      |  SELECT node FROM seeds
      |  UNION
      |  SELECT e.dst FROM edges e, r WHERE e.src = r.node
      |)
      |SELECT node FROM r""".stripMargin

  test("distributed reachability on a chain") {
    val edges = TestData.edgesDf(spark, Seq((0, 1), (1, 2), (2, 3), (5, 6)))
    val got   = SparkReachability.reachable(spark, edges, Seq(0)).collect().map(_.getInt(0)).toSet
    assert(got == Set(0, 1, 2, 3))
  }

  test("distributed reachability on a cycle terminates") {
    val edges = TestData.edgesDf(spark, Seq((0, 1), (1, 2), (2, 0)))
    assert(SparkReachability.spread(spark, edges, Seq(2)) == 3)
  }

  test("seeds with no outgoing edges reach only themselves") {
    val edges = TestData.edgesDf(spark, Seq((0, 1)))
    assert(SparkReachability.spread(spark, edges, Seq(7)) == 1)
  }

  test("multiple seeds union their reach") {
    val edges = TestData.edgesDf(spark, Seq((0, 1), (2, 3)))
    assert(SparkReachability.spread(spark, edges, Seq(0, 2)) == 4)
  }

  test("distributed reachability equals local BFS on random graphs") {
    for (seed <- 0 until 4) {
      val edges = TestData.randomEdges(25, 60, 900L + seed)
      val g     = TestData.digraphOf(25, edges)
      val seeds = Seq(seed % 25, (seed * 11) % 25)
      val want  = g.spreadOf(seeds)
      val got   = SparkReachability.spread(spark, TestData.edgesDf(spark, edges), seeds)
      assert(got == want, s"seed=$seed got=$got want=$want")
    }
  }

  test("distributed reachability matches the DuckDB recursive CTE") {
    val edges = TestData.randomEdges(18, 40, 31L)
    val seeds = Seq(3, 11)
    val sparkDf = SparkReachability
      .reachable(spark, TestData.edgesDf(spark, edges), seeds)
      .select(col("node").cast("string").as("node"))
    Oracle.assertEquivalent(
      sparkDf,
      reachSql,
      "edges" -> TestData.edgesDf(spark, edges),
      "seeds" -> TestData.seedsDf(spark, seeds),
    )
  }
}
