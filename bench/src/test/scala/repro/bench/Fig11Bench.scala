package repro.bench

import repro.SparkSpec
import repro.experiments.{Defaults, Experiments}
import repro.stream.InteractionStreams

/** Fig. 11 — HistApprox vs Greedy across budgets k (ε = 0.2; paper:
  * k = 10..100, L = 10K — ours k = 10..100, L = 5000, 400 steps).
  *
  * Paper shapes asserted: solution quality stays ≳ 0.9 of Greedy across the
  * whole sweep and HistApprox stays cheaper than Greedy. Known deviation
  * (recorded in EXPERIMENTS.md): at 1/100 scale the call ratio *rises* with k
  * instead of falling — k here is 2–25% of |V_t| (vs < 0.5% in the paper), so
  * lazy Greedy's k-independent initial scan dominates its cost while the
  * sieve's threshold count grows with log k.
  */
class Fig11Bench extends SparkSpec {

  test("Fig 11: k sweep") {
    val rows = Experiments.fig11(
      spark,
      Seq(InteractionStreams.twitterHiggs, InteractionStreams.twitterHK),
      ks = Seq(10, 25, 50, 100),
      steps = 400, eps = 0.2, maxL = Defaults.maxL, pOf = Defaults.pFor,
    )

    println("BENCH|Fig11| dataset            k  valRatio  callRatio")
    rows.foreach { r =>
      println(f"BENCH|Fig11| ${r.dataset}%-16s ${r.param}%4d ${r.valueRatioToGreedy}%9.3f ${r.callRatioToGreedy}%10.3f")
    }

    rows.foreach { r =>
      assert(r.valueRatioToGreedy >= 0.85, s"${r.dataset} k=${r.param}: ${r.valueRatioToGreedy}")
      assert(r.callRatioToGreedy < 1.05, s"${r.dataset} k=${r.param}: ${r.callRatioToGreedy}")
    }
  }
}
