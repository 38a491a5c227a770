package repro.ic

import org.scalatest.funsuite.AnyFunSuite
import repro.TestData
import repro.core.{CelfGreedy, OracleCounter}

class ImmTimSpec extends AnyFunSuite {

  private def rng(seed: Long) = new java.util.Random(seed)

  private def icFromEdges(edges: Seq[(Int, Int)], x: Int, universe: Int): IcGraph =
    IcGraph.fromCounts(edges.distinct.map(e => (e, x)), universe)

  test("logChoose is sane") {
    assert(Imm.logChoose(10, 0) == 0.0)
    assert(Imm.logChoose(10, 10) == 0.0)
    assert(math.abs(Imm.logChoose(10, 2) - math.log(45.0)) < 0.05)
    assert(math.abs(Imm.logChoose(100, 10) - 30.5) < 1.0) // ln C(100,10) ≈ 30.5
  }

  test("IMM on empty graph returns nothing") {
    assert(Imm.select(IcGraph.fromCounts(Nil, 5), 2, 0.3, rng(1)).isEmpty)
  }

  test("IMM returns every node when n <= k") {
    val ic = icFromEdges(Seq((0, 1)), 1, 5)
    assert(Imm.select(ic, 5, 0.3, rng(1)).toSet == Set(0, 1))
  }

  test("IMM finds the hub of a high-probability star") {
    val star = (1 to 8).map(i => (0, i))
    val ic   = icFromEdges(star, 50, 10) // p ~ 1
    for (s <- 0 until 3) {
      val seeds = Imm.select(ic, 1, 0.3, rng(s.toLong), maxRR = 5000)
      assert(seeds == Seq(0), s"seed=$s got $seeds")
    }
  }

  test("IMM returns at most k distinct seeds") {
    val ic = icFromEdges(TestData.randomEdges(30, 90, 5L), 3, 30)
    val s  = Imm.select(ic, 4, 0.3, rng(2L), maxRR = 3000)
    assert(s.size <= 4 && s.distinct.size == s.size)
  }

  test("TIM+ on empty graph returns nothing") {
    assert(TimPlus.select(IcGraph.fromCounts(Nil, 5), 2, 0.3, rng(1)).isEmpty)
  }

  test("TIM+ finds the hub of a high-probability star") {
    val star = (1 to 8).map(i => (0, i))
    val ic   = icFromEdges(star, 50, 10)
    for (s <- 0 until 3) {
      val seeds = TimPlus.select(ic, 1, 0.3, rng(s.toLong), maxRR = 5000)
      assert(seeds == Seq(0), s"seed=$s got $seeds")
    }
  }

  test("TIM+ returns at most k distinct seeds") {
    val ic = icFromEdges(TestData.randomEdges(30, 90, 6L), 5, 30)
    val s  = TimPlus.select(ic, 4, 0.3, rng(3L), maxRR = 3000)
    assert(s.size <= 4 && s.distinct.size == s.size)
  }

  test("IMM and TIM+ seed quality is near reachability-greedy on dense high-p graphs") {
    // With p ~ 1 the IC spread approaches deterministic reachability, so both
    // should score close to CELF greedy under the reachability oracle.
    for (seed <- 0 until 3) {
      val edges = TestData.randomEdges(20, 40, 500L + seed)
      val g     = TestData.digraphOf(20, edges)
      val ic    = icFromEdges(edges, 60, 20) // p ~ 1
      val (gs, gv) = CelfGreedy.select(g, 3, new OracleCounter)
      val iv       = g.spreadOf(Imm.select(ic, 3, 0.3, rng(seed.toLong), maxRR = 4000))
      val tv       = g.spreadOf(TimPlus.select(ic, 3, 0.3, rng(seed.toLong), maxRR = 4000))
      assert(iv >= 0.7 * gv, s"seed=$seed IMM $iv vs greedy $gv")
      assert(tv >= 0.7 * gv, s"seed=$seed TIM+ $tv vs greedy $gv")
    }
  }
}
