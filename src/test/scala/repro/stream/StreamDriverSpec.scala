package repro.stream

import repro.SparkSpec
import repro.core.{GreedyTracker, HistApprox, RandomTracker}
import repro.tdn.{Lifetimes, TimedEdge}

class StreamDriverSpec extends SparkSpec {

  private def smallBatches = {
    val spec = InteractionStreams.twitterHK
    val df   = Lifetimes.withGeometricLifetimes(
      InteractionStreams.prefix(spark, spec, 30), p = 0.05, maxL = 50, seed = 1L)
    StreamDriver.batchesFromDf(df, spec.universe, maxSteps = 30)
  }

  test("batchesFromDf groups edges by timestep with empty steps preserved") {
    import spark.implicits._
    val df = Seq((0, 1, 2, 3), (0, 4, 5, 2), (3, 6, 7, 1))
      .toDF("ts", "src", "dst", "lifetime")
    val b = StreamDriver.batchesFromDf(df, universe = 10, maxSteps = 5)
    assert(b.steps.length == 5)
    assert(b.steps(0).toSet == Set(TimedEdge(1, 2, 3), TimedEdge(4, 5, 2)))
    assert(b.steps(1).isEmpty && b.steps(2).isEmpty)
    assert(b.steps(3) == Seq(TimedEdge(6, 7, 1)))
    assert(b.steps(4).isEmpty)
    assert(b.totalEdges == 3)
  }

  test("batchesFromDf drops rows beyond maxSteps") {
    import spark.implicits._
    val df = Seq((0, 1, 2, 3), (9, 4, 5, 2)).toDF("ts", "src", "dst", "lifetime")
    val b  = StreamDriver.batchesFromDf(df, 10, maxSteps = 5)
    assert(b.totalEdges == 1)
  }

  test("run produces one record per query step per algorithm") {
    val b    = smallBatches
    val hist = new HistApprox(5, 0.2, 50, b.universe)
    val rnd  = new RandomTracker(5, b.universe, seed = 2L)
    val recs = StreamDriver.run(b, Seq(hist, rnd), queryEvery = 1)
    assert(recs("HistApprox").size == 30)
    assert(recs("Random").size == 30)
    assert(recs("HistApprox").map(_.t) == (0 until 30).toVector)
  }

  test("queryEvery > 1 samples query steps but always includes the last") {
    val b    = smallBatches
    val hist = new HistApprox(5, 0.2, 50, b.universe)
    val recs = StreamDriver.run(b, Seq(hist), queryEvery = 7)
    val ts   = recs("HistApprox").map(_.t)
    assert(ts.contains(29))
    assert(ts.forall(t => (t + 1) % 7 == 0 || t == 29))
  }

  test("values are evaluated on the shared ground truth (HistApprox >= Random on average)") {
    val b    = smallBatches
    val hist = new HistApprox(5, 0.2, 50, b.universe)
    val rnd  = new RandomTracker(5, b.universe, seed = 3L)
    val recs = StreamDriver.run(b, Seq(hist, rnd))
    val hv   = recs("HistApprox").map(_.value.toDouble).sum
    val rv   = recs("Random").map(_.value.toDouble).sum
    assert(hv >= rv, s"hist=$hv random=$rv")
  }

  test("greedy dominates HistApprox's evaluated value on average") {
    val b      = smallBatches
    val hist   = new HistApprox(3, 0.2, 50, b.universe)
    val greedy = new GreedyTracker(3, b.universe)
    val recs   = StreamDriver.run(b, Seq(hist, greedy))
    val hv     = recs("HistApprox").map(_.value.toDouble).sum
    val gv     = recs("Greedy").map(_.value.toDouble).sum
    assert(gv >= 0.95 * hv, s"greedy=$gv hist=$hv")
    // and HistApprox stays close to Greedy (the paper's Fig 9 shape).
    assert(hv >= 0.7 * gv, s"hist=$hv greedy=$gv")
  }

  test("oracle calls and elapsed time are cumulative and non-decreasing") {
    val b    = smallBatches
    val hist = new HistApprox(3, 0.2, 50, b.universe)
    val recs = StreamDriver.run(b, Seq(hist))("HistApprox")
    recs.sliding(2).foreach {
      case Vector(a, c) =>
        assert(c.oracleCallsCum >= a.oracleCallsCum)
        assert(c.elapsedNanosCum >= a.elapsedNanosCum)
      case _ => ()
    }
  }

  test("throughput is positive and finite") {
    val b    = smallBatches
    val hist = new HistApprox(3, 0.2, 50, b.universe)
    val recs = StreamDriver.run(b, Seq(hist))
    val tp   = StreamDriver.throughputEdgesPerSec(b, recs("HistApprox"))
    assert(tp > 0 && !tp.isInfinite)
  }
}
