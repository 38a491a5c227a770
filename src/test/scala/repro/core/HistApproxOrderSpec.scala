package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.TestData
import repro.tdn.TimedEdge

/** Ordering and edge-case behavior of HistApprox's batch processing. */
class HistApproxOrderSpec extends AnyFunSuite {

  test("within-batch input order does not matter (groups are processed by lifetime)") {
    val batch = Seq(
      TimedEdge(0, 1, 5), TimedEdge(2, 3, 2), TimedEdge(4, 5, 9),
      TimedEdge(6, 7, 2), TimedEdge(8, 9, 5),
    )
    val a = new HistApprox(2, 0.2, 10, 12)
    val b = new HistApprox(2, 0.2, 10, 12)
    a.observe(batch)
    b.observe(new scala.util.Random(1L).shuffle(batch))
    assert(a.indices == b.indices)
    assert(a.currentValue == b.currentValue)
    assert(a.querySolution.toSet == b.querySolution.toSet)
  }

  test("endStep without observe is a no-op on an empty tracker") {
    val h = new HistApprox(2, 0.2, 10, 10)
    (0 until 5).foreach(_ => h.endStep())
    assert(h.indices.isEmpty)
    assert(h.oracleCalls == 0)
  }

  test("interleaved empty steps decay correctly") {
    val h = new HistApprox(1, 0.2, 10, 10)
    h.observe(Seq(TimedEdge(0, 1, 2)))
    h.endStep()
    h.observe(Nil)
    assert(h.currentValue == 2) // still alive at t=1
    h.endStep()
    h.observe(Nil)
    assert(h.currentValue == 0) // expired at t=2
  }

  test("an edge re-arriving with a shorter lifetime does not shorten the alive copy") {
    val h = new HistApprox(1, 0.2, 10, 10)
    h.observe(Seq(TimedEdge(0, 1, 5)))
    h.endStep()
    h.observe(Seq(TimedEdge(0, 1, 1))) // same pair, short lifetime
    h.endStep()
    // Original copy (lifetime 5) still alive at t=2..4.
    h.observe(Nil)
    assert(h.currentValue == 2)
  }

  test("long random streams keep the tracker internally consistent") {
    val stream = TestData.randomTimedStream(20, steps = 120, perStep = 2, maxL = 30, seed = 17L)
    val h      = new HistApprox(3, 0.25, 30, 20)
    stream.foreach { batch =>
      h.observe(batch)
      val xs = h.indices
      assert(xs == xs.sorted && xs.distinct == xs)
      assert(h.querySolution.size <= 3)
      assert(h.currentValue >= 0)
      h.endStep()
    }
  }

  test("oracle calls are monotonically non-decreasing") {
    val stream = TestData.randomTimedStream(15, steps = 30, perStep = 2, maxL = 10, seed = 19L)
    val h      = new HistApprox(2, 0.2, 10, 15)
    var prev   = 0L
    stream.foreach { batch =>
      h.observe(batch)
      assert(h.oracleCalls >= prev)
      prev = h.oracleCalls
      h.endStep()
    }
  }
}
