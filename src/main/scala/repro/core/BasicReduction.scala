package repro.core

import scala.collection.mutable
import repro.tdn.TimedEdge

/** BasicReduction (Alg. 2): L SieveADN instances, where instance A_i processes
  * every arriving edge with lifetime ≥ i. After each step the head instance
  * (A_1, which by construction has processed exactly the alive edges of G_t)
  * produces the solution and is terminated; the rest shift left; a fresh
  * instance joins at the tail.
  *
  * (1/2 − ε)-approximate (Theorem 4); time/space are L× SieveADN (Theorem 5) —
  * this is the paper's deliberately heavy baseline that HistApprox improves.
  */
final class BasicReduction(
    val k: Int,
    val eps: Double,
    val maxLifetime: Int,
    val universe: Int,
    val counter: OracleCounter = new OracleCounter,
) extends StreamingInfluenceAlgo {
  require(maxLifetime >= 1, "L must be >= 1")

  // Head (index 0) is A_1.
  private val instances = mutable.ArrayDeque.fill(maxLifetime)(newInstance())

  private def newInstance(): SieveAdn = new SieveAdn(k, eps, universe, counter)

  override def name: String = "BasicReduction"

  /** Instance A_i (1-based), exposed for invariant tests. */
  def instance(i: Int): SieveAdn = instances(i - 1)

  override def observe(batch: Seq[TimedEdge]): Unit = {
    if (batch.isEmpty) return
    // Edges with lifetime l feed A_1..A_min(l,L); feed each instance the
    // suffix of the batch whose lifetime reaches it (Alg. 2 line 3).
    val sorted = batch.sortBy(-_.lifetime)
    var i      = 0
    while (i < maxLifetime) {
      val sub = sorted.takeWhile(_.lifetime >= i + 1)
      if (sub.isEmpty) return
      instances(i).process(sub.map(e => (e.u, e.v)))
      i += 1
    }
  }

  override def querySolution: Seq[Int] = instances.head.solution

  /** Value of the head instance's solution, g_t(1). */
  def currentValue: Int = instances.head.currentValue

  override def endStep(): Unit = {
    instances.removeHead() // terminate A_1
    instances.append(newInstance()) // create A_L for t+1
  }

  override def oracleCalls: Long = counter.calls
}
