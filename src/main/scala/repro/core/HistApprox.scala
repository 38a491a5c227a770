package repro.core

import scala.collection.mutable
import repro.tdn.{Tdn, TimedEdge}

/** HistApprox (Alg. 3): approximates BasicReduction's histogram of L SieveADN
  * outputs g_t(l) by keeping only a sparse, ε-redundancy-pruned index set x_t
  * of active instances. (1/3 − ε)-approximate (Theorem 7) with
  * O(ε⁻¹ log k) live instances instead of L (Theorem 8).
  *
  * The tracker also maintains the TDN G_t itself (alive edges with remaining
  * lifetimes): instance creation in the "has successor" case copies the
  * successor instance and back-fills it with alive edges whose remaining
  * lifetime falls in [l, l*) — that data lives only in G_t.
  */
final class HistApprox(
    val k: Int,
    val eps: Double,
    val maxLifetime: Int,
    val universe: Int,
    val counter: OracleCounter = new OracleCounter,
) extends StreamingInfluenceAlgo {
  require(maxLifetime >= 1, "L must be >= 1")

  // Active instances keyed by index: keys ascending = x_1 < x_2 < ...
  private val hist = mutable.TreeMap.empty[Int, SieveAdn]
  private val tdn  = new Tdn

  override def name: String = "HistApprox"

  /** Active index set x_t, ascending. */
  def indices: Seq[Int] = hist.keys.toSeq

  /** Number of live SieveADN instances |x_t|. */
  def activeInstances: Int = hist.size

  /** The TDN state (exposed for tests and fair cross-algorithm evaluation). */
  def currentTdn: Tdn = tdn

  /** g_t(l) for an active index l. */
  def valueAt(l: Int): Int = hist(l).currentValue

  override def observe(batch: Seq[TimedEdge]): Unit = {
    if (batch.isEmpty) return
    val capped = batch.map(e => if (e.lifetime > maxLifetime) e.copy(lifetime = maxLifetime) else e)
    // Alg. 3 line 3: process lifetime groups in increasing l.
    capped.groupBy(_.lifetime).toSeq.sortBy(_._1).foreach { case (l, group) =>
      tdn.add(group)
      processEdges(l, group)
      reduceRedundancy()
    }
  }

  /** Alg. 3 ProcessEdges(Ē_l). */
  private def processEdges(l: Int, group: Seq[TimedEdge]): Unit = {
    if (!hist.contains(l)) {
      hist.rangeFrom(l + 1).headOption match {
        case None =>
          // Fig. 6(b): no successor — no alive edge can have lifetime ≥ l
          // (tested invariant), so a fresh instance starts empty.
          hist(l) = new SieveAdn(k, eps, universe, counter)
        case Some((lStar, succ)) =>
          // Fig. 6(c): copy the successor, then back-fill the alive edges it
          // has not seen: remaining lifetime in [l, l*).
          val inst = succ.copyInstance()
          inst.process(tdn.aliveInRange(l, lStar).map(e => (e.u, e.v)))
          hist(l) = inst
      }
    }
    // Alg. 3 line 17: feed every active instance with index ≤ l.
    val edges = group.map(e => (e.u, e.v))
    hist.rangeTo(l).valuesIterator.foreach(_.process(edges))
  }

  /** Alg. 3 ReduceRedundancy: kill instances strictly between i and the
    * largest j > i whose output is within (1−ε) of g(i).
    */
  private def reduceRedundancy(): Unit = {
    var keys = hist.keys.toIndexedSeq
    var idx  = 0
    while (idx < keys.length) {
      val gi   = hist(keys(idx)).currentValue
      var jIdx = -1
      var m    = keys.length - 1
      while (m > idx && jIdx < 0) {
        if (hist(keys(m)).currentValue >= (1.0 - eps) * gi) jIdx = m
        m -= 1
      }
      if (jIdx > idx + 1) {
        ((idx + 1) until jIdx).foreach(d => hist.remove(keys(d)))
        keys = hist.keys.toIndexedSeq
      }
      idx += 1
    }
  }

  override def querySolution: Seq[Int] =
    hist.headOption.map(_._2.solution).getOrElse(Nil)

  /** g_t(x_1): value of the output instance. */
  def currentValue: Int = hist.headOption.map(_._2.currentValue).getOrElse(0)

  override def endStep(): Unit = {
    // Alg. 3 lines 5–7: terminate A_1 if x_1 = 1, then shift every index left.
    if (hist.nonEmpty && hist.firstKey == 1) hist.remove(1)
    val shifted = hist.toSeq.map { case (l, a) => (l - 1, a) }
    hist.clear()
    shifted.foreach { case (l, a) => hist(l) = a }
    tdn.advance()
  }

  override def oracleCalls: Long = counter.calls
}
