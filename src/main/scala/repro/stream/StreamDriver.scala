package repro.stream

import org.apache.spark.sql.DataFrame
import scala.collection.mutable
import repro.core.StreamingInfluenceAlgo
import repro.tdn.{Tdn, TimedEdge}

/** Micro-batch experiment harness: replays per-time-step interaction batches
  * through a set of streaming trackers, evaluates every returned seed set
  * against the *same* ground-truth TDN (fair cross-algorithm values), and
  * ledgers per-algorithm oracle calls and wall time (for throughput).
  */
object StreamDriver {

  /** A replayable stream: `steps(t)` is the batch Ē_t. */
  final case class Batches(universe: Int, steps: IndexedSeq[Seq[TimedEdge]]) {
    def totalEdges: Long = steps.iterator.map(_.size.toLong).sum
  }

  /** Collect a (ts, src, dst, lifetime) DataFrame into per-step batches.
    * Steps absent from the data become empty batches (the TDN still decays).
    */
  def batchesFromDf(df: DataFrame, universe: Int, maxSteps: Int): Batches = {
    val rows = df
      .select("ts", "src", "dst", "lifetime")
      .collect()
      .map(r => (r.getInt(0), TimedEdge(r.getInt(1), r.getInt(2), r.getInt(3))))
      .filter(_._1 < maxSteps)
    val byTs = rows.groupBy(_._1)
    val steps = (0 until maxSteps).map(t => byTs.get(t).map(_.map(_._2).toSeq).getOrElse(Nil))
    Batches(universe, steps)
  }

  /** One algorithm's measurement at one query step. */
  final case class StepRecord(
      t: Int,
      algo: String,
      seeds: Seq[Int],
      value: Int,          // f_t(seeds) on the ground-truth G_t
      oracleCallsCum: Long,
      elapsedNanosCum: Long,
  )

  /** Replay `batches` through `algos`.
    *
    * @param queryEvery query (and evaluate) every `queryEvery` steps
    * @return records grouped by algorithm name, in time order
    */
  def run(
      batches: Batches,
      algos: Seq[StreamingInfluenceAlgo],
      queryEvery: Int = 1,
  ): Map[String, Vector[StepRecord]] = {
    require(queryEvery >= 1)
    val truth   = new Tdn
    val elapsed = mutable.Map.from(algos.map(a => a.name -> 0L))
    val out     = mutable.Map.from(algos.map(a => a.name -> Vector.empty[StepRecord]))

    batches.steps.zipWithIndex.foreach { case (batch, t) =>
      truth.add(batch)
      val isQuery = (t + 1) % queryEvery == 0 || t == batches.steps.length - 1
      val gt      = if (isQuery) truth.toDigraph(batches.universe) else null

      algos.foreach { algo =>
        val t0 = System.nanoTime()
        algo.observe(batch)
        val seeds = if (isQuery) algo.querySolution else Nil
        algo.endStep()
        elapsed(algo.name) += System.nanoTime() - t0
        if (isQuery) {
          val value = if (seeds.isEmpty) 0 else gt.spreadOf(seeds)
          out(algo.name) :+= StepRecord(t, algo.name, seeds, value, algo.oracleCalls, elapsed(algo.name))
        }
      }
      truth.advance()
    }
    out.toMap
  }

  /** Throughput in processed edges per second for one algorithm's records. */
  def throughputEdgesPerSec(batches: Batches, records: Vector[StepRecord]): Double = {
    val nanos = records.lastOption.map(_.elapsedNanosCum).getOrElse(0L)
    if (nanos == 0L) 0.0 else batches.totalEdges.toDouble * 1e9 / nanos
  }
}
