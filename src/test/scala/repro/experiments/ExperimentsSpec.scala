package repro.experiments

import repro.SparkSpec
import repro.stream.InteractionStreams
import repro.stream.InteractionStreams.StreamSpec

/** The experiment harness itself, on deliberately tiny configurations. */
class ExperimentsSpec extends SparkSpec {

  private val tiny = StreamSpec(
    "tiny", nSrc = 60, nDst = 60, interactions = 300L, steps = 300,
    zipfAlpha = 1.1, bipartite = false, seed = 999L,
  )

  test("batchesFor re-times to one interaction per step") {
    val b = Experiments.batchesFor(spark, tiny, steps = 50, p = 0.05, maxL = 20)
    assert(b.steps.length == 50)
    assert(b.steps.forall(_.size <= 1))
    assert(b.totalEdges == 50)
    assert(b.universe == 60)
  }

  test("batchesFor lifetimes respect the cap") {
    val b = Experiments.batchesFor(spark, tiny, steps = 80, p = 0.05, maxL = 7)
    assert(b.steps.flatten.forall(e => e.lifetime >= 1 && e.lifetime <= 7))
  }

  test("tableI reports one row per dataset with the paper's numbers attached") {
    // Covered end-to-end in the bench; here just the paper-side bookkeeping.
    assert(InteractionStreams.paperTableI.size == 6)
    assert(InteractionStreams.paperTableI("twitter-hk") == (49808L, 2930439L))
  }

  test("fig7 rows carry consistent ratios on a tiny run") {
    val rows = Experiments.fig7(
      spark, Seq(tiny), ps = Seq(0.05), steps = 40, k = 3, eps = 0.2, maxL = 30,
    )
    assert(rows.size == 1)
    val r = rows.head
    assert(r.dataset == "tiny")
    assert(r.basicValue > 0 && r.histValue > 0)
    assert(math.abs(r.valueRatio - r.histValue / r.basicValue) < 1e-12)
    assert(r.histCalls <= r.basicCalls)
  }

  test("fig8to10Rows shares one Greedy run across eps values") {
    val rows = Experiments.fig8to10Rows(
      spark, Seq(tiny), epss = Seq(0.1, 0.3), steps = 60, k = 3,
      maxL = 30, pOf = _ => 0.05,
    )
    assert(rows.size == 2)
    assert(rows.map(_.avgGreedyValue).distinct.size == 1, "same Greedy baseline for all eps")
    rows.foreach { r =>
      assert(r.valueRatioToGreedy > 0 && r.valueRatioToGreedy <= 1.2)
      assert(r.callRatioToGreedy > 0)
    }
  }

  test("fig11 and fig12 sweep the requested parameter") {
    val k = Experiments.fig11(spark, Seq(tiny), ks = Seq(2, 4), steps = 40,
      eps = 0.2, maxL = 30, pOf = _ => 0.05)
    assert(k.map(_.param) == Seq(2, 4))
    val l = Experiments.fig12(spark, Seq(tiny), ls = Seq(20, 40), steps = 40,
      k = 3, eps = 0.2, pOf = _ => 0.05)
    assert(l.map(_.param) == Seq(20, 40))
  }

  test("fig13to14 produces one row per algorithm with positive throughput") {
    val rows = Experiments.fig13to14(
      spark, Seq(tiny), steps = 40, k = 3, maxL = 30, pOf = _ => 0.05, maxRR = 500,
    )
    assert(rows.map(_.algo).toSet ==
      Set("Greedy", "HistApprox", "DIM", "IMM", "TIM+", "Random"))
    rows.foreach(r => assert(r.throughputEdgesPerSec > 0))
    val by = rows.map(r => r.algo -> r.valueRatioToGreedy).toMap
    assert(math.abs(by("Greedy") - 1.0) < 1e-9)
  }

  test("NamedHistApprox disambiguates eps in the tracker name") {
    val t = new Experiments.NamedHistApprox(3, 0.15, 30, 60)
    assert(t.name == "HistApprox(eps=0.15)")
    t.observe(Seq(repro.tdn.TimedEdge(0, 1, 5)))
    assert(t.querySolution.nonEmpty)
    t.endStep()
    assert(t.oracleCalls > 0)
  }

  test("Defaults keep the paper's regime: L >> 1/p") {
    InteractionStreams.all.foreach { spec =>
      assert(Defaults.maxL > 5.0 / Defaults.pFor(spec) * 0.9, spec.name)
    }
  }
}
