package repro.tdn

import scala.collection.mutable.ArrayBuffer
import repro.core.Digraph

/** An interaction edge as it enters the TDN: u influenced v, with the lifetime
  * assigned at arrival (l_τ(e) in the paper, 1 ≤ lifetime ≤ L).
  */
final case class TimedEdge(u: Int, v: Int, lifetime: Int) {
  require(lifetime >= 1, s"lifetime must be >= 1, got $lifetime")
}

/** The time-decaying dynamic interaction network G_t (§II-B).
  *
  * Stores the alive multiset of edges. Rather than decrementing every lifetime
  * each step, each edge stores its expiry time: an edge arriving at time τ with
  * lifetime l is alive for t ∈ [τ, τ+l) and its remaining lifetime at time t is
  * `expiry − t`. [[advance]] moves the clock and compacts expired edges.
  *
  * `now` starts at 0; callers add the batch for step t while `now == t`, then
  * call [[advance]] once per step.
  */
final class Tdn {
  private final case class Alive(u: Int, v: Int, expiry: Int)

  private val edges          = new ArrayBuffer[Alive]()
  private var clock          = 0
  private var expiredPending = 0

  /** Current time t. */
  def now: Int = clock

  /** Add a batch of edges arriving at the current time. */
  def add(batch: Iterable[TimedEdge]): Unit =
    batch.foreach(e => edges += Alive(e.u, e.v, clock + e.lifetime))

  /** Advance the clock one step; edges whose lifetime reached 0 are dropped. */
  def advance(): Unit = {
    clock += 1
    expiredPending += 1
    // Compact lazily but often enough that iteration stays O(alive).
    if (expiredPending >= 8 || edges.count(_.expiry <= clock) * 4 > edges.size) {
      val kept = edges.filter(_.expiry > clock)
      edges.clear()
      edges ++= kept
      expiredPending = 0
    }
  }

  /** Alive edges at the current time, with remaining lifetime (≥ 1). */
  def aliveEdges: Seq[TimedEdge] =
    edges.iterator
      .filter(_.expiry > clock)
      .map(a => TimedEdge(a.u, a.v, a.expiry - clock))
      .toSeq

  /** Alive edges whose remaining lifetime l_e satisfies lo ≤ l_e < hi —
    * the back-fill set HistApprox feeds to a freshly copied instance.
    */
  def aliveInRange(lo: Int, hi: Int): Seq[TimedEdge] =
    aliveEdges.filter(e => e.lifetime >= lo && e.lifetime < hi)

  /** Number of alive edges (with multiplicity). */
  def aliveCount: Int = edges.count(_.expiry > clock)

  /** Largest remaining lifetime among alive edges, 0 if empty. */
  def maxRemainingLifetime: Int =
    edges.iterator.filter(_.expiry > clock).map(_.expiry - clock).maxOption.getOrElse(0)

  /** Multiplicity of alive interactions per (u, v) — the `x` that feeds the
    * IC-model diffusion probability p_uv = 2/(1+e^{−0.2x}) − 1 (§V-C).
    */
  def interactionCounts: Map[(Int, Int), Int] =
    edges.iterator
      .filter(_.expiry > clock)
      .map(a => (a.u, a.v))
      .toSeq
      .groupBy(identity)
      .view
      .mapValues(_.size)
      .toMap

  /** Snapshot G_t as a reachability graph over `universe` node ids. */
  def toDigraph(universe: Int): Digraph = {
    val g = new Digraph(universe)
    edges.iterator.filter(_.expiry > clock).foreach(a => g.addEdge(a.u, a.v))
    g
  }

  /** Distinct nodes present in G_t. */
  def aliveNodes: Set[Int] =
    edges.iterator.filter(_.expiry > clock).flatMap(a => Iterator(a.u, a.v)).toSet
}
