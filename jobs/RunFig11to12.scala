package repro.jobs

import repro.experiments.{Defaults, Experiments}
import repro.stream.InteractionStreams

/** Figs. 11–12: HistApprox vs Greedy across budgets k and lifetime caps L
  * (ε = 0.2) on the two Twitter datasets.
  *
  * Usage: spark-submit --class repro.jobs.RunFig11to12 <jar> [steps]
  */
object RunFig11to12 {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session("RunFig11to12")
    val steps = Jobs.intArg(args, 0, 100)
    val specs = Seq(InteractionStreams.twitterHiggs, InteractionStreams.twitterHK)
    try {
      val k11 = Experiments.fig11(
        spark, specs, ks = Seq(10, 25, 50, 100),
        steps = steps, eps = 0.2, maxL = Defaults.maxL, pOf = Defaults.pFor,
      )
      println("Fig 11 — k sweep (eps=0.2)")
      println(f"${"dataset"}%-16s ${"k"}%4s ${"valRatio"}%9s ${"callRatio"}%10s")
      k11.foreach(r => println(f"${r.dataset}%-16s ${r.param}%4d ${r.valueRatioToGreedy}%9.3f ${r.callRatioToGreedy}%10.3f"))

      // L from 10x to 100x of 1/p, as in the paper (L=10K..100K at p=0.001):
      // truncation never binds, so L should not matter (Fig 12's message).
      val l12 = Experiments.fig12(
        spark, specs, ls = Seq(5000, 10000, 20000, 50000),
        steps = steps, k = 10, eps = 0.2, pOf = Defaults.pFor,
      )
      println("Fig 12 — L sweep (eps=0.2, k=10)")
      println(f"${"dataset"}%-16s ${"L"}%4s ${"valRatio"}%9s ${"callRatio"}%10s")
      l12.foreach(r => println(f"${r.dataset}%-16s ${r.param}%4d ${r.valueRatioToGreedy}%9.3f ${r.callRatioToGreedy}%10.3f"))
    } finally spark.stop()
  }
}
