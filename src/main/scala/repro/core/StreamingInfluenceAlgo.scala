package repro.core

import repro.tdn.TimedEdge

/** Common contract of all streaming influential-node trackers (Problem 1).
  *
  * A driver feeds one batch per discrete time step via [[observe]], may call
  * [[querySolution]] at any time, and must call [[endStep]] exactly once per
  * step to advance the algorithm's clock (instance shifting / expiry).
  */
trait StreamingInfluenceAlgo {

  /** Display name (used by the bench harnesses). */
  def name: String

  /** Feed the batch Ē_t arriving at the current step. */
  def observe(batch: Seq[TimedEdge]): Unit

  /** Current solution S_t (≤ k nodes). */
  def querySolution: Seq[Int]

  /** Advance to the next time step. */
  def endStep(): Unit

  /** Cumulative oracle calls since construction. */
  def oracleCalls: Long
}
