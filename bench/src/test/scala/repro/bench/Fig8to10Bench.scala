package repro.bench

import repro.SparkSpec
import repro.experiments.{Defaults, Experiments}
import repro.stream.InteractionStreams

/** Figs. 8–10 — HistApprox(ε ∈ {0.1, 0.15, 0.2}) vs Greedy vs Random on all
  * six datasets (k = 10; paper: L = 10K, p = 0.001, 5000 steps — ours
  * L = 5000, p = 0.002, 1500 steps).
  *
  * Paper shapes asserted: Greedy ≥ HistApprox ≫ Random in value (Fig 8);
  * HistApprox within ~8% of Greedy (Fig 9: ratio ≳ 0.9); HistApprox uses a
  * fraction of Greedy's oracle calls (Fig 10: paper 5–15× fewer at ε = 0.2).
  */
class Fig8to10Bench extends SparkSpec {

  test("Figs 8-10: HistApprox vs Greedy vs Random") {
    val rows = Experiments.fig8to10Rows(
      spark, InteractionStreams.all,
      epss = Seq(0.1, 0.15, 0.2),
      steps = 1500, k = 10, maxL = Defaults.maxL, pOf = Defaults.pFor,
    )

    println("BENCH|Fig8to10| dataset              eps   histVal  greedyVal  randomVal  valRatio  callRatio")
    rows.foreach { r =>
      println(f"BENCH|Fig8to10| ${r.dataset}%-20s ${r.eps}%4.2f ${r.avgHistValue}%8.1f ${r.avgGreedyValue}%10.1f ${r.avgRandomValue}%10.1f ${r.valueRatioToGreedy}%9.3f ${r.callRatioToGreedy}%10.3f")
    }

    rows.foreach { r =>
      // Fig 8 ordering: Greedy >= Hist >> Random.
      assert(r.avgGreedyValue >= r.avgHistValue * 0.99, s"${r.dataset} eps=${r.eps}")
      assert(r.avgRandomValue < 0.5 * r.avgHistValue, s"${r.dataset} eps=${r.eps}: Random not clearly dominated")
      // Fig 9: HistApprox close to Greedy.
      assert(r.valueRatioToGreedy >= 0.85, s"${r.dataset} eps=${r.eps}: value ratio ${r.valueRatioToGreedy}")
      // Fig 10: far fewer oracle calls than Greedy.
      assert(r.callRatioToGreedy < 1.0, s"${r.dataset} eps=${r.eps}: call ratio ${r.callRatioToGreedy}")
    }
    // The densest dataset shows the paper's ε-trend most clearly: larger ε ⇒
    // fewer calls.
    val hk = rows.filter(_.dataset == "twitter-hk").sortBy(_.eps).map(_.callRatioToGreedy)
    assert(hk.last < hk.head, s"twitter-hk call ratio should fall with eps ($hk)")
  }
}
