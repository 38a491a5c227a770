package repro.jobs

import repro.experiments.Experiments

/** Table I: dataset summary (paper numbers vs 1/100-scale synthetics).
  *
  * Usage: spark-submit --class repro.jobs.RunTableI <jar>
  */
object RunTableI {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session("RunTableI")
    try {
      println(f"${"dataset"}%-20s ${"paper nodes"}%12s ${"paper inter"}%12s ${"ours nodes"}%11s ${"ours inter"}%11s")
      Experiments.tableI(spark).foreach { r =>
        println(f"${r.dataset}%-20s ${r.paperNodes}%12d ${r.paperInteractions}%12d ${r.nodes}%11d ${r.interactions}%11d")
      }
    } finally spark.stop()
  }
}
