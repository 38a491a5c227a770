package repro.core

/** Counter of influence-oracle evaluations.
  *
  * The paper's efficiency metric is the *number of oracle calls* — evaluations
  * of f_t or of a marginal gain δ_S(v) — because an oracle call is the dominant
  * cost and the count is independent of hardware and of serial/parallel
  * implementation (§V-C). Every algorithm in this repo threads one of these
  * through its f evaluations; reads of a value cached since the last graph
  * change are free, recomputations count one call each.
  */
final class OracleCounter {
  private var n: Long = 0L
  def inc(): Unit = n += 1
  def calls: Long = n
  def reset(): Unit = n = 0L
}

/** The influence-spread oracle (Definition 3): f_t(S) = number of distinct
  * nodes reachable from S in G_t, seeds included.
  */
object Influence {

  /** Evaluate f(S) on `g`, counting one oracle call. */
  def spread(g: Digraph, seeds: IterableOnce[Int], counter: OracleCounter): Int = {
    counter.inc()
    g.spreadOf(seeds)
  }

  /** Marginal gain δ_S(v) = f(S ∪ {v}) − f(S), counting one oracle call
    * (f(S) is assumed cached by the caller as `baseValue`/`baseReach`).
    */
  def marginalGain(
      g: Digraph,
      baseReach: java.util.BitSet,
      baseValue: Int,
      v: Int,
      counter: OracleCounter,
  ): Int = {
    counter.inc()
    val u = g.reach(Iterator.single(v))
    u.or(baseReach)
    u.cardinality() - baseValue
  }
}
