package repro.jobs

import repro.experiments.{Defaults, Experiments}

/** Fig. 7: BasicReduction vs HistApprox across lifetime skew p on the LBSN
  * datasets (ε = 0.1, k = 10).
  *
  * Usage: spark-submit --class repro.jobs.RunFig7 <jar> [steps] [L]
  */
object RunFig7 {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session("RunFig7")
    val steps = Jobs.intArg(args, 0, 120)
    val maxL  = Jobs.intArg(args, 1, 300)
    try {
      val rows = Experiments.fig7(
        spark, Defaults.lbsn,
        ps = Seq(0.004, 0.008, 0.016, 0.032),
        steps = steps, k = 10, eps = 0.1, maxL = maxL,
      )
      println(f"${"dataset"}%-14s ${"p"}%7s ${"basicVal"}%9s ${"histVal"}%9s ${"val ratio"}%9s ${"basicCalls"}%11s ${"histCalls"}%10s ${"call ratio"}%10s")
      rows.foreach { r =>
        println(f"${r.dataset}%-14s ${r.p}%7.3f ${r.basicValue}%9.1f ${r.histValue}%9.1f ${r.valueRatio}%9.3f ${r.basicCalls}%11.0f ${r.histCalls}%10.0f ${r.callRatio}%10.3f")
      }
    } finally spark.stop()
  }
}
