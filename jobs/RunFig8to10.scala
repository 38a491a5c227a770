package repro.jobs

import repro.experiments.{Defaults, Experiments}
import repro.stream.InteractionStreams

/** Figs. 8–10: HistApprox(ε ∈ {0.1, 0.15, 0.2}) vs Greedy vs Random on all
  * six datasets — average values, value ratio (Fig 9), oracle-call ratio
  * (Fig 10).
  *
  * Usage: spark-submit --class repro.jobs.RunFig8to10 <jar> [steps]
  */
object RunFig8to10 {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session("RunFig8to10")
    val steps = Jobs.intArg(args, 0, 120)
    try {
      val rows = Experiments.fig8to10Rows(
        spark, InteractionStreams.all,
        epss = Seq(0.1, 0.15, 0.2),
        steps = steps, k = 10, maxL = Defaults.maxL, pOf = Defaults.pFor,
      )
      println(f"${"dataset"}%-20s ${"eps"}%5s ${"hist"}%8s ${"greedy"}%8s ${"random"}%8s ${"valRatio"}%9s ${"callRatio"}%10s")
      rows.foreach { r =>
        println(f"${r.dataset}%-20s ${r.eps}%5.2f ${r.avgHistValue}%8.1f ${r.avgGreedyValue}%8.1f ${r.avgRandomValue}%8.1f ${r.valueRatioToGreedy}%9.3f ${r.callRatioToGreedy}%10.3f")
      }
    } finally spark.stop()
  }
}
