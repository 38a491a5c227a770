package repro.spark

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}
import repro.ic.IcGraph

class InfluenceProbabilitiesSpec extends SparkSpec {
  import spark.implicits._

  private lazy val interactions =
    Seq((0, 1), (0, 1), (0, 1), (2, 1), (3, 4)).toDF("src", "dst")

  test("aggregates interaction multiplicity per directed pair") {
    val got = InfluenceProbabilities
      .fromInteractions(interactions)
      .collect()
      .map(r => (r.getInt(0), r.getInt(1)) -> r.getLong(2))
      .toMap
    assert(got == Map((0, 1) -> 3L, (2, 1) -> 1L, (3, 4) -> 1L))
  }

  test("probability column equals the local formula") {
    InfluenceProbabilities.fromInteractions(interactions).collect().foreach { r =>
      val x = r.getLong(2).toInt
      assert(math.abs(r.getDouble(3) - IcGraph.probabilityOf(x)) < 1e-12)
    }
  }

  test("aggregation matches DuckDB") {
    val sparkDf = InfluenceProbabilities
      .fromInteractions(interactions)
      .select($"src", $"dst", $"x", round($"p", 6).as("p"))
    Oracle.assertEquivalent(
      sparkDf,
      "SELECT src, dst, count(*) AS x, " +
        "round(2.0/(1.0+exp(-0.2*count(*))) - 1.0, 6) AS p " +
        "FROM interactions GROUP BY src, dst",
      "interactions" -> interactions,
    )
  }

  test("matches IcGraph.fromCounts end-to-end on a generated stream") {
    val df = repro.stream.InteractionStreams
      .prefix(spark, repro.stream.InteractionStreams.twitterHK, 40)
    val sparkPairs = InfluenceProbabilities
      .fromInteractions(df)
      .collect()
      .map(r => ((r.getInt(0), r.getInt(1)), r.getDouble(3)))
      .toMap
    val counts = df.collect().map(r => (r.getInt(1), r.getInt(2)))
      .groupBy(identity).view.mapValues(_.length).toMap
    val ic = IcGraph.fromCounts(counts.toSeq, repro.stream.InteractionStreams.twitterHK.universe)
    sparkPairs.foreach { case ((u, v), p) =>
      assert(math.abs(ic.probability(u, v) - p) < 1e-9, s"($u,$v)")
    }
    assert(sparkPairs.size == ic.edgeCount)
  }
}
