package repro.jobs

import repro.experiments.{Defaults, Experiments}

/** Figs. 13–14: solution quality (value ratio vs Greedy) and throughput for
  * HistApprox(ε=0.3), DIM, IMM, TIM+, Random on the four social datasets.
  *
  * Usage: spark-submit --class repro.jobs.RunFig13to14 <jar> [steps]
  */
object RunFig13to14 {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session("RunFig13to14")
    val steps = Jobs.intArg(args, 0, 80)
    try {
      val rows = Experiments.fig13to14(
        spark, Defaults.social,
        steps = steps, k = 10, maxL = Defaults.maxL, pOf = Defaults.pFor,
      )
      println(f"${"dataset"}%-20s ${"algo"}%-12s ${"valRatio"}%9s ${"edges/s"}%12s")
      rows.foreach { r =>
        println(f"${r.dataset}%-20s ${r.algo}%-12s ${r.valueRatioToGreedy}%9.3f ${r.throughputEdgesPerSec}%12.1f")
      }
    } finally spark.stop()
  }
}
