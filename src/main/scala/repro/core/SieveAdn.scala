package repro.core

import java.util.{BitSet => JBitSet}
import scala.collection.mutable
import scala.collection.mutable.ArrayBuffer

/** SieveADN (Alg. 1): streaming influence maximization over an addition-only
  * dynamic interaction network, with a (1/2 − ε) approximation guarantee.
  *
  * The instance owns its own accumulated graph (an ADN: edges only arrive,
  * never expire within the instance's lifetime — BasicReduction/HistApprox
  * terminate whole instances instead of deleting edges).
  *
  * Mechanics per arriving batch Ē_t:
  *  1. insert the edges into the instance graph;
  *  2. compute the candidate set V̄_t = nodes whose influence spread changed:
  *     for each inserted edge (u,v), {v} ∪ reverseReach(u);
  *  3. evaluate f({v}) for each candidate (one oracle call each), updating
  *     Δ = max singleton spread, and lazily maintain the threshold set
  *     Θ = {(1+ε)^i/(2k) : (1+ε)^i ∈ [Δ, 2kΔ]} (Alg. 1 lines 4–7);
  *  4. update every sieve's cached reach(S_θ)/f(S_θ) *incrementally*: a new
  *     edge (u,v) extends reach(S) iff u ∈ reach(S), in which case
  *     reach(S) ∪= reach(v) — the candidate reach-sets from step 3 are reused,
  *     so this is exact set algebra with no further oracle calls;
  *  5. sieve each candidate into every non-full threshold set whose θ its
  *     marginal gain meets (one oracle call per evaluation, Alg. 1 lines 8–11).
  *
  * The oracle-call ledger therefore counts exactly the f evaluations the
  * paper's complexity analysis counts: O(b · ε⁻¹ log k) per batch (Theorem 3).
  */
final class SieveAdn private (
    val k: Int,
    val eps: Double,
    val universe: Int,
    val counter: OracleCounter,
    private val graph0: Digraph,
) {
  require(k >= 1, "k must be >= 1")
  require(eps > 0 && eps < 1, "eps must be in (0,1)")

  def this(k: Int, eps: Double, universe: Int, counter: OracleCounter) =
    this(k, eps, universe, counter, new Digraph(universe))

  import SieveAdn.Sieve

  val graph: Digraph        = graph0
  private var deltaMax: Int = 0 // Δ: max singleton spread seen
  private val sieves        = mutable.TreeMap.empty[Int, Sieve] // exponent i -> S_θi
  private val logBase       = math.log1p(eps)

  /** θ_i = (1+ε)^i / (2k). */
  private def thetaOf(i: Int): Double = math.pow(1.0 + eps, i) / (2.0 * k)

  /** Alg. 1 lines 5–7: keep exponents i with (1+ε)^i ∈ [Δ, 2kΔ]. */
  private def refreshThresholds(): Unit = {
    if (deltaMax <= 0) return
    val lo    = math.ceil(math.log(deltaMax.toDouble) / logBase - 1e-9).toInt
    val hi    = math.floor(math.log(2.0 * k * deltaMax) / logBase + 1e-9).toInt
    val stale = sieves.keys.filter(i => i < lo || i > hi).toList
    stale.foreach(sieves.remove)
    var i = lo
    while (i <= hi) {
      if (!sieves.contains(i)) sieves(i) = new Sieve
      i += 1
    }
  }

  /** Candidate set V̄: for each newly inserted edge (u,v), v plus every node
    * that can reach u (their spread grew). Computed on the post-insert graph;
    * reverse BFS is bookkeeping, not an oracle call.
    */
  private def candidates(inserted: Seq[(Int, Int)]): Seq[Int] = {
    val acc = new JBitSet(universe)
    inserted.foreach { case (u, v) =>
      acc.set(v)
      acc.or(graph.reverseReach(u))
    }
    val out = new ArrayBuffer[Int](acc.cardinality())
    var i   = acc.nextSetBit(0)
    while (i >= 0) { out += i; i = acc.nextSetBit(i + 1) }
    out.toSeq
  }

  /** Process one batch of arriving edges (the ADN view: additions only). */
  def process(batch: Seq[(Int, Int)]): Unit = {
    val inserted = batch.filter { case (u, v) => graph.addEdge(u, v) }
    if (inserted.isEmpty) return

    val cand = candidates(inserted)

    // Δ update (Alg. 1 line 4) — f({v}) for each candidate, one call each;
    // the reach-sets are retained for the incremental update and sieving pass.
    val candReach = mutable.LinkedHashMap.empty[Int, JBitSet]
    cand.foreach { v =>
      counter.inc()
      val r = graph.reach(Iterator.single(v))
      candReach(v) = r
      val f1 = r.cardinality()
      if (f1 > deltaMax) deltaMax = f1
    }
    refreshThresholds()

    // Exact incremental maintenance of cached reach(S_θ)/f(S_θ): any path
    // from S to a newly reachable node crosses a first inserted edge (u,v)
    // whose source u was already in the old reach(S), and reach(v) on the
    // post-insert graph is transitively complete — so a single sweep or-ing
    // candidate reach-sets is exact. Set algebra only, no oracle calls.
    sieves.values.foreach { s =>
      if (s.members.nonEmpty) {
        inserted.foreach { case (u, v) =>
          if (s.reach.get(u)) s.reach.or(candReach(v))
        }
        s.value = s.reach.cardinality()
      }
    }

    // Sieving pass (Alg. 1 lines 8–11): one oracle call per marginal gain.
    // Submodularity pruning: δ_S(v) ≤ f({v}), so thresholds above f({v})
    // are guaranteed rejections — skip them without an oracle call.
    candReach.foreach { case (v, rv) =>
      val f1    = rv.cardinality()
      val maxI  = math.floor(math.log(2.0 * k * f1) / logBase + 1e-9).toInt
      sieves.rangeTo(maxI).foreach { case (i, s) =>
        if (s.members.length < k && !s.members.contains(v)) {
          counter.inc()
          val u = s.reach.clone().asInstanceOf[JBitSet]
          u.or(rv)
          val gain = u.cardinality() - s.value
          if (gain >= thetaOf(i)) {
            s.members += v
            s.reach = u
            s.value += gain
          }
        }
      }
    }
  }

  /** Convenience: process timed edges, ignoring lifetimes (ADN view). */
  def processTimed(batch: Seq[repro.tdn.TimedEdge]): Unit =
    process(batch.map(e => (e.u, e.v)))

  /** g = f(S_{θ*}): value of the best sieve set (Alg. 1 line 12). Cached
    * values are maintained exactly, so this is free of oracle calls.
    */
  def currentValue: Int = {
    var best = 0
    sieves.values.foreach(s => if (s.value > best) best = s.value)
    best
  }

  /** The best sieve set S_{θ*}. */
  def solution: Seq[Int] = {
    var best: Sieve = null
    var bestV       = -1
    sieves.values.foreach(s => if (s.value > bestV) { bestV = s.value; best = s })
    if (best == null) Nil else best.members.toSeq
  }

  /** Number of live threshold sets |Θ| (for complexity tests). */
  def thresholdCount: Int = sieves.size

  /** Current Δ (max singleton spread observed). */
  def delta: Int = deltaMax

  /** Deep copy sharing the oracle counter — HistApprox instance creation. */
  def copyInstance(): SieveAdn = {
    val c = new SieveAdn(k, eps, universe, counter, graph.copy())
    c.deltaMax = deltaMax
    sieves.foreach { case (i, s) => c.sieves(i) = s.copySieve() }
    c
  }
}

object SieveAdn {

  /** One threshold's sieve set S_θ with exactly-maintained f(S_θ), reach(S_θ). */
  private final class Sieve {
    val members        = new ArrayBuffer[Int](4)
    var reach: JBitSet = new JBitSet(0)
    var value: Int     = 0

    def copySieve(): Sieve = {
      val s = new Sieve
      s.members ++= members
      s.reach = reach.clone().asInstanceOf[JBitSet]
      s.value = value
      s
    }
  }
}
