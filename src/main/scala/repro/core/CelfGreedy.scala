package repro.core

import java.util.{BitSet => JBitSet}
import scala.collection.mutable

/** Lazy greedy (CELF, Minoux's accelerated greedy) for cardinality-constrained
  * monotone submodular maximization — the paper's "Greedy" baseline (§V-C):
  * rerun from scratch on G_t at every query, (1 − 1/e)-approximate, with lazy
  * evaluation to cut oracle calls.
  */
object CelfGreedy {

  /** Select up to k seeds maximizing reachability spread on `g`.
    *
    * @return (seeds, f(seeds))
    */
  def select(g: Digraph, k: Int, counter: OracleCounter): (Seq[Int], Int) = {
    if (g.nodeCount == 0 || k <= 0) return (Nil, 0)

    // Max-heap of (cached upper bound on marginal gain, node, round computed).
    final case class Entry(gain: Int, node: Int, round: Int)
    implicit val ord: Ordering[Entry] = Ordering.by(e => (e.gain, e.node))
    val heap = mutable.PriorityQueue.empty[Entry]

    g.nodes.foreach { v =>
      counter.inc()
      heap.enqueue(Entry(g.reach(Iterator.single(v)).cardinality(), v, 0))
    }

    val seeds             = mutable.ArrayBuffer.empty[Int]
    var reach: JBitSet    = new JBitSet(g.universe)
    var value             = 0
    var round             = 0

    while (seeds.length < k && heap.nonEmpty) {
      val top = heap.dequeue()
      if (top.round == round) {
        // Lazy evaluation: bound is fresh for this round — take it.
        seeds += top.node
        val u = g.reach(Iterator.single(top.node))
        u.or(reach)
        reach = u
        value = reach.cardinality()
        round += 1
      } else if (top.gain > 0) {
        counter.inc()
        val u = g.reach(Iterator.single(top.node))
        u.or(reach)
        val gain = u.cardinality() - value
        heap.enqueue(Entry(gain, top.node, round))
      }
      // top.gain == 0 and stale: submodularity says it can only shrink — drop.
    }
    (seeds.toSeq, value)
  }

  /** Plain (non-lazy) greedy — test oracle for CELF's equivalence. */
  def selectNaive(g: Digraph, k: Int, counter: OracleCounter): (Seq[Int], Int) = {
    val seeds          = mutable.ArrayBuffer.empty[Int]
    var reach: JBitSet = new JBitSet(g.universe)
    var value          = 0
    while (seeds.length < k) {
      var bestNode = -1
      var bestGain = 0
      g.nodes.foreach { v =>
        if (!seeds.contains(v)) {
          counter.inc()
          val u = g.reach(Iterator.single(v))
          u.or(reach)
          val gain = u.cardinality() - value
          if (gain > bestGain || (gain == bestGain && gain > 0 && (bestNode < 0 || v > bestNode))) {
            bestGain = gain
            bestNode = v
          }
        }
      }
      if (bestNode < 0) return (seeds.toSeq, value)
      seeds += bestNode
      val u = g.reach(Iterator.single(bestNode))
      u.or(reach)
      reach = u
      value = reach.cardinality()
    }
    (seeds.toSeq, value)
  }
}
