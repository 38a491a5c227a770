package repro.ic

import scala.collection.mutable
import repro.core.StreamingInfluenceAlgo
import repro.tdn.{Tdn, TimedEdge}

/** DIM-lite: a simplified reimplementation of the dynamic RR-sketch index of
  * Ohsaka et al. (VLDB 2016), the paper's "DIM" baseline (β = 32 as in §V-C).
  *
  * Maintained state: a fixed pool of R = β·256 RR sketches (each a target node
  * plus the sampled reverse-reachable node set) over the current IC graph, and
  * a node→sketch inverted index.
  *
  *  - Edge insertion (u, v): every live sketch containing v but not u flips a
  *    coin with the marginal probability of one more interaction and, on
  *    success, extends by a reverse IC walk from u (the incremental insertion
  *    rule of the original system). Newly appearing nodes re-target a
  *    proportional share of the pool so targets stay ~uniform over V_t.
  *  - Edge expiry / probability decrease: sketches containing the affected
  *    head — and sketches whose target or members left the graph — are marked
  *    stale and lazily resampled at query time (the original rebuilds eagerly;
  *    lazy rebuild batches the same work).
  *  - A rotating 10% slice of the pool is additionally refreshed per query,
  *    bounding the drift between long-lived sketches and the current IC graph
  *    (the original's sketch distribution is kept exact by bookkeeping we
  *    approximate here; see DESIGN.md §5).
  *
  * Queries run greedy max-cover over the pool. The simplification preserves
  * the paper's observed behaviour: reasonable but less stable solution
  * quality, and throughput between Greedy and the static-index methods.
  */
final class DimTracker(
    k: Int,
    universe: Int,
    beta: Int = 32,
    seed: Long = 7L,
    alwaysRebuild: Boolean = false, // diagnostic: resample the whole pool per query
) extends StreamingInfluenceAlgo {

  private val rng      = new java.util.Random(seed)
  private val tdn      = new Tdn
  private val poolSize = math.max(256, beta * 256)

  private val targets   = new Array[Int](poolSize)
  private val sketches  = new Array[Array[Int]](poolSize)
  private val stale     = new java.util.BitSet(poolSize)
  private val byNode    = new mutable.HashMap[Int, mutable.BitSet]
  private var prevCount = Map.empty[(Int, Int), Int]
  private var refreshCursor = 0
  private var icCache: IcGraph = IcGraph.fromCounts(Nil, universe)

  { (0 until poolSize).foreach(stale.set) } // everything starts unsampled

  override def name: String = "DIM"

  def currentTdn: Tdn = tdn

  private def index(id: Int, nodes: Array[Int]): Unit =
    nodes.foreach(v => byNode.getOrElseUpdate(v, mutable.BitSet.empty) += id)

  private def unindex(id: Int): Unit = {
    val s = sketches(id)
    if (s != null) s.foreach(v => byNode.get(v).foreach(_ -= id))
  }

  override def observe(batch: Seq[TimedEdge]): Unit = {
    val before = tdn.aliveNodes
    tdn.add(batch)
    icCache = IcGraph.fromCounts(tdn.interactionCounts, universe)

    // New nodes: re-target a proportional share of the pool so that sketch
    // targets keep approximating a uniform draw over V_t.
    val after    = tdn.aliveNodes
    val newNodes = after -- before
    if (newNodes.nonEmpty && after.nonEmpty) {
      val quota = math.max(1, poolSize * newNodes.size / after.size)
      (0 until quota).foreach(_ => stale.set(rng.nextInt(poolSize)))
    }

    // Incremental insertion: extend live sketches that contain the new head.
    // The coin is the *marginal* activation probability of going from x−1 to
    // x interactions, (p_x − p_{x−1})/(1 − p_{x−1}) — flipping the full
    // single-interaction p on every repeat would overextend old sketches
    // until max-cover saturates.
    val countsNow = tdn.interactionCounts
    batch.foreach { e =>
      val x     = countsNow.getOrElse((e.u, e.v), 1)
      val pPrev = IcGraph.probabilityOf(x - 1)
      val pMarg = (IcGraph.probabilityOf(x) - pPrev) / math.max(1e-12, 1.0 - pPrev)
      byNode.get(e.v).foreach { ids =>
        ids.toSeq.foreach { id =>
          if (!stale.get(id)) {
            val cur = sketches(id)
            if (cur != null && !cur.contains(e.u) && rng.nextDouble() < pMarg) {
              val ext    = RRSets.sample(icCache, e.u, rng)
              val merged = (cur.toSet ++ ext).toArray
              unindex(id)
              sketches(id) = merged
              index(id, merged)
            }
          }
        }
      }
    }
  }

  override def endStep(): Unit = {
    tdn.advance()
    val now   = tdn.interactionCounts
    val alive = tdn.aliveNodes
    // Decreased (u, v) multiplicity invalidates sketches containing the head.
    prevCount.foreach { case ((u, v), x) =>
      if (now.getOrElse((u, v), 0) < x)
        byNode.get(v).foreach(_.foreach(stale.set))
    }
    // Sketches referencing departed nodes (target or member) are invalid.
    var id = 0
    while (id < poolSize) {
      if (!stale.get(id) && sketches(id) != null) {
        if (!alive.contains(targets(id)) || sketches(id).exists(!alive.contains(_)))
          stale.set(id)
      }
      id += 1
    }
    prevCount = now
    icCache = IcGraph.fromCounts(now, universe)
  }

  private def rebuildStale(): Unit = {
    if (icCache.nodeCount == 0) {
      // Nothing alive: every sketch is vacuous; clear them.
      var id = stale.nextSetBit(0)
      while (id >= 0) { unindex(id); sketches(id) = null; id = stale.nextSetBit(id + 1) }
      return
    }
    var id = stale.nextSetBit(0)
    while (id >= 0) {
      unindex(id)
      val target = icCache.nodes(rng.nextInt(icCache.nodeCount))
      val s      = RRSets.sample(icCache, target, rng)
      targets(id) = target
      sketches(id) = s
      index(id, s)
      stale.clear(id)
      id = stale.nextSetBit(id + 1)
    }
  }

  override def querySolution: Seq[Int] = {
    if (alwaysRebuild) (0 until poolSize).foreach(stale.set)
    else {
      // Age cap: refresh a rotating 10% slice per query so every sketch is
      // resampled at least every 10 queries — bounds the drift between the
      // pool and the current IC graph without a full rebuild.
      val slice = math.max(1, poolSize / 10)
      (0 until slice).foreach(i => stale.set((refreshCursor + i) % poolSize))
      refreshCursor = (refreshCursor + slice) % poolSize
    }
    rebuildStale()
    val live = sketches.iterator.filter(_ != null).toIndexedSeq
    if (live.isEmpty) Nil
    else RRSets.maxCover(live, k, universe)._1
  }

  override def oracleCalls: Long = 0L

  /** Diagnostics for tests/probes: (live sketches, avg size, stale count). */
  def poolStats: (Int, Double, Int) = {
    val live = sketches.filter(_ != null)
    val avg  = if (live.isEmpty) 0.0 else live.map(_.length).sum.toDouble / live.length
    (live.length, avg, stale.cardinality())
  }
}
