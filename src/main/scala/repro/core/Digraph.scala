package repro.core

import java.util.{BitSet => JBitSet}
import scala.collection.mutable.ArrayBuffer

/** Mutable directed graph over a dense integer node universe `[0, universe)`.
  *
  * This is the reachability substrate of the influence oracle (Definition 3 in
  * the paper): nodes are interaction endpoints, edges are (deduplicated)
  * influence relations. Multi-edges in the TDN collapse to one adjacency entry
  * here because multiplicity does not change reachability — interaction
  * multiplicity only matters for the IC-model baselines ([[repro.ic.IcGraph]]).
  *
  * Both forward and reverse adjacency are kept: forward BFS computes influence
  * spread; reverse BFS computes the candidate set V̄_t (nodes whose spread can
  * change when an edge is inserted).
  *
  * Not thread-safe; each SieveADN instance owns one.
  */
final class Digraph private (
    val universe: Int,
    private val fwd: Array[ArrayBuffer[Int]],
    private val rev: Array[ArrayBuffer[Int]],
    private val present: JBitSet,
    private val edgeKeys: java.util.HashSet[Long],
) {

  def this(universe: Int) =
    this(
      universe,
      new Array[ArrayBuffer[Int]](universe),
      new Array[ArrayBuffer[Int]](universe),
      new JBitSet(universe),
      new java.util.HashSet[Long](),
    )

  /** Number of distinct (u, v) edges. */
  def edgeCount: Int = edgeKeys.size

  /** Number of nodes that appear as an endpoint of at least one edge. */
  def nodeCount: Int = present.cardinality()

  /** True iff `v` appears as an endpoint of some edge. */
  def hasNode(v: Int): Boolean = present.get(v)

  /** Nodes present in the graph, ascending. */
  def nodes: Iterator[Int] =
    Iterator.unfold(present.nextSetBit(0)) { i =>
      if (i < 0) None else Some((i, present.nextSetBit(i + 1)))
    }

  private def key(u: Int, v: Int): Long = (u.toLong << 32) | (v.toLong & 0xffffffffL)

  /** Insert edge u→v; self-loops and duplicates are ignored.
    *
    * @return true iff the edge was new (changed the reachability structure)
    */
  def addEdge(u: Int, v: Int): Boolean = {
    require(u >= 0 && u < universe && v >= 0 && v < universe, s"edge ($u,$v) outside universe $universe")
    if (u == v || !edgeKeys.add(key(u, v))) return false
    if (fwd(u) == null) fwd(u) = new ArrayBuffer[Int](4)
    if (rev(v) == null) rev(v) = new ArrayBuffer[Int](4)
    fwd(u) += v
    rev(v) += u
    present.set(u)
    present.set(v)
    true
  }

  def hasEdge(u: Int, v: Int): Boolean = edgeKeys.contains(key(u, v))

  def outNeighbors(u: Int): Seq[Int] = { val b = fwd(u); if (b == null) Nil else b.toSeq }
  def inNeighbors(v: Int): Seq[Int]  = { val b = rev(v); if (b == null) Nil else b.toSeq }

  private def bfs(adj: Array[ArrayBuffer[Int]], seeds: IterableOnce[Int]): JBitSet = {
    val visited = new JBitSet(universe)
    var stack   = new Array[Int](64)
    var top     = 0
    def push(x: Int): Unit = {
      if (top == stack.length) stack = java.util.Arrays.copyOf(stack, stack.length * 2)
      stack(top) = x; top += 1
    }
    seeds.iterator.foreach { s =>
      if (s >= 0 && s < universe && !visited.get(s)) { visited.set(s); push(s) }
    }
    while (top > 0) {
      top -= 1
      val u  = stack(top)
      val ns = adj(u)
      if (ns != null) {
        var i = 0
        while (i < ns.length) {
          val w = ns(i)
          if (!visited.get(w)) { visited.set(w); push(w) }
          i += 1
        }
      }
    }
    visited
  }

  /** Set of nodes reachable from `seeds` (seeds included). */
  def reach(seeds: IterableOnce[Int]): JBitSet = bfs(fwd, seeds)

  /** Set of nodes that can reach `target` (target included). */
  def reverseReach(target: Int): JBitSet = bfs(rev, Iterator.single(target))

  /** Influence spread of `seeds`: |reach(seeds)|. Callers that must count
    * oracle calls go through [[Influence.spread]] instead.
    */
  def spreadOf(seeds: IterableOnce[Int]): Int = reach(seeds).cardinality()

  /** Deep copy — used when HistApprox clones a SieveADN instance. */
  def copy(): Digraph = {
    val f = new Array[ArrayBuffer[Int]](universe)
    val r = new Array[ArrayBuffer[Int]](universe)
    var i = 0
    while (i < universe) {
      if (fwd(i) != null) f(i) = fwd(i).clone()
      if (rev(i) != null) r(i) = rev(i).clone()
      i += 1
    }
    new Digraph(
      universe, f, r,
      present.clone().asInstanceOf[JBitSet],
      new java.util.HashSet[Long](edgeKeys),
    )
  }
}
