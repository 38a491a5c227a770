package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.TestData
import repro.tdn.{Tdn, TimedEdge}

class BasicReductionSpec extends AnyFunSuite {

  private def drive(
      algo: BasicReduction,
      stream: IndexedSeq[Seq[TimedEdge]],
  ): IndexedSeq[(Int, Seq[Int])] =
    stream.zipWithIndex.map { case (batch, t) =>
      algo.observe(batch)
      val out = (algo.currentValue, algo.querySolution)
      algo.endStep()
      out
    }

  test("constructor validates L") {
    intercept[IllegalArgumentException](new BasicReduction(2, 0.1, 0, 10))
  }

  test("invariant: A_1 has processed exactly the alive edges of G_t") {
    val stream = TestData.randomTimedStream(15, steps = 25, perStep = 3, maxL = 5, seed = 2L)
    val algo   = new BasicReduction(2, 0.1, maxLifetime = 5, universe = 15)
    val truth  = new Tdn
    stream.foreach { batch =>
      truth.add(batch)
      algo.observe(batch)
      val head  = algo.instance(1).graph
      val alive = truth.aliveEdges.map(e => (e.u, e.v)).toSet
      assert(
        alive == (for {
          u <- 0 until 15; v <- 0 until 15 if head.hasEdge(u, v)
        } yield (u, v)).toSet,
        s"t=${truth.now}",
      )
      algo.endStep()
      truth.advance()
    }
  }

  test("invariant: A_i only sees edges with lifetime >= i") {
    val algo = new BasicReduction(2, 0.1, maxLifetime = 4, universe = 10)
    algo.observe(Seq(TimedEdge(0, 1, 1), TimedEdge(2, 3, 3), TimedEdge(4, 5, 4)))
    assert(algo.instance(1).graph.edgeCount == 3)
    assert(algo.instance(2).graph.edgeCount == 2)
    assert(algo.instance(3).graph.edgeCount == 2)
    assert(algo.instance(4).graph.edgeCount == 1)
    assert(algo.instance(4).graph.hasEdge(4, 5))
    assert(!algo.instance(2).graph.hasEdge(0, 1))
  }

  test("shifting: instance A_{i} at t becomes A_{i-1} at t+1, new tail is empty") {
    val algo = new BasicReduction(2, 0.1, maxLifetime = 3, universe = 10)
    algo.observe(Seq(TimedEdge(0, 1, 3)))
    val a3 = algo.instance(3)
    algo.endStep()
    assert(algo.instance(2) eq a3)
    assert(algo.instance(3).graph.edgeCount == 0)
  }

  test("lifetimes above L are effectively capped at L") {
    val algo = new BasicReduction(2, 0.1, maxLifetime = 3, universe = 10)
    algo.observe(Seq(TimedEdge(0, 1, 9)))
    assert(algo.instance(3).graph.hasEdge(0, 1))
  }

  test("solution on a sliding-window stream matches a fresh SieveADN over the window") {
    // All lifetimes = W: at any t, A_1 has seen the last W batches.
    val w      = 3
    val stream = TestData.randomTimedStream(12, steps = 12, perStep = 2, maxL = 1, seed = 4L)
      .map(_.map(_.copy(lifetime = w)))
    val algo = new BasicReduction(2, 0.15, maxLifetime = w, universe = 12)
    stream.zipWithIndex.foreach { case (batch, t) =>
      algo.observe(batch)
      // Reference: fresh SieveADN fed the alive window batch-by-batch.
      val ref = new SieveAdn(2, 0.15, 12, new OracleCounter)
      stream.slice(math.max(0, t - w + 1), t + 1).foreach(b => ref.process(b.map(e => (e.u, e.v))))
      assert(algo.currentValue == ref.currentValue, s"t=$t")
      algo.endStep()
    }
  }

  test("achieves (1/2 - eps) of OPT on the alive graph at every step (Theorem 4)") {
    val eps = 0.1
    for (seed <- 0 until 6) {
      val stream = TestData.randomTimedStream(12, steps = 15, perStep = 2, maxL = 4, seed = seed.toLong)
      val algo   = new BasicReduction(2, eps, maxLifetime = 4, universe = 12)
      val truth  = new Tdn
      stream.foreach { batch =>
        truth.add(batch)
        algo.observe(batch)
        val gt       = truth.toDigraph(12)
        val (_, opt) = BruteForce.select(gt, 2)
        val value    = if (algo.querySolution.isEmpty) 0 else gt.spreadOf(algo.querySolution)
        assert(value >= (0.5 - eps) * opt - 1e-9, s"seed=$seed t=${truth.now} value=$value opt=$opt")
        algo.endStep()
        truth.advance()
      }
    }
  }

  test("oracle calls accumulate across instances") {
    val algo = new BasicReduction(2, 0.1, maxLifetime = 5, universe = 10)
    assert(algo.oracleCalls == 0)
    algo.observe(Seq(TimedEdge(0, 1, 5)))
    assert(algo.oracleCalls > 0)
  }

  test("empty batches are free") {
    val algo = new BasicReduction(2, 0.1, maxLifetime = 5, universe = 10)
    algo.observe(Nil)
    assert(algo.oracleCalls == 0)
    algo.endStep()
    assert(algo.querySolution.isEmpty)
  }

  test("expired edges stop contributing to the solution") {
    val algo = new BasicReduction(1, 0.1, maxLifetime = 5, universe = 10)
    algo.observe(Seq(TimedEdge(0, 1, 1), TimedEdge(0, 2, 1), TimedEdge(0, 3, 1)))
    assert(algo.currentValue == 4)
    algo.endStep()
    algo.observe(Seq(TimedEdge(5, 6, 2)))
    assert(algo.currentValue == 2, "star around 0 expired; only 5->6 alive")
    algo.endStep()
  }
}
