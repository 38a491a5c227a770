package repro.stream

import org.apache.spark.sql.functions._
import repro.SparkSpec

/** The unit-step re-timing used by every experiment (§V-B setting). */
class UnitStepSpec extends SparkSpec {

  test("unitStepPrefix yields exactly one interaction per timestep") {
    val df = InteractionStreams.unitStepPrefix(spark, InteractionStreams.twitterHK, 120)
    assert(df.count() == 120)
    assert(df.groupBy("ts").count().filter(col("count") =!= 1).count() == 0)
    val mm = df.agg(min("ts"), max("ts")).collect()(0)
    assert(mm.getInt(0) == 0 && mm.getInt(1) == 119)
  }

  test("unitStepPrefix is deterministic across invocations") {
    // Note: the unit-step stream is NOT the row-prefix of the batched stream —
    // Spark's rand(seed) draws depend on the range's partition layout. What
    // experiments rely on is replay determinism of the same call.
    val n = 200
    def rows = InteractionStreams.unitStepPrefix(spark, InteractionStreams.twitterHiggs, n)
      .orderBy("ts").collect().map(r => (r.getInt(0), r.getInt(1), r.getInt(2))).toSeq
    assert(rows == rows)
  }

  test("unitStepPrefix caps at the dataset's interaction count") {
    val spec = InteractionStreams.twitterHiggs
    val df   = InteractionStreams.unitStepPrefix(spark, spec, Int.MaxValue)
    assert(df.count() == spec.interactions)
  }

  test("social dst ids are heavy-tailed but distinct from src ranking") {
    val df = InteractionStreams.unitStepPrefix(spark, InteractionStreams.stackOverflowC2Q, 5000)
    val top = df.groupBy("dst").count().orderBy(desc("count")).limit(500).collect()
    assert(top.head.getLong(1) > 4 * top(250).getLong(1), "dst not heavy-tailed")
    val topSrc = df.groupBy("src").count().orderBy(desc("count")).limit(1).collect()(0).getInt(0)
    val topDst = top.head.getInt(0)
    assert(topSrc != topDst, "src/dst rankings should be decorrelated")
  }

  test("multi-hop cascades exist: some influencees are also influencers") {
    val df   = InteractionStreams.unitStepPrefix(spark, InteractionStreams.twitterHK, 2000)
    val srcs = df.select("src").distinct().collect().map(_.getInt(0)).toSet
    val dsts = df.select("dst").distinct().collect().map(_.getInt(0)).toSet
    val both = srcs intersect dsts
    assert(both.size > 50, s"only ${both.size} nodes on both sides — no cascade depth")
  }
}
