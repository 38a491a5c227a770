package repro.experiments

import repro.stream.InteractionStreams
import repro.stream.InteractionStreams.StreamSpec

/** Shared experiment parameters (jobs and benches must agree so EXPERIMENTS.md
  * numbers are regenerable from either entry point).
  *
  * The per-dataset decay rate p targets a moderately dense alive graph
  * (alive edges ≈ perStep / p comparable to the node universe), mirroring the
  * sparsity regime of the paper's runs (their p = 0.001 at 1 edge/step).
  */
object Defaults {

  // L >> 1/p as in the paper (L = 10K at p = 0.001): truncation never binds.
  val maxL: Int = 5000

  /** Geometric decay rate (paper: Geo(0.001) truncated at L = 10K; ours is
    * scaled so the alive graph holds a few hundred interactions at 1/step).
    */
  def pFor(spec: StreamSpec): Double = 0.002

  /** LBSN datasets (Fig. 7 uses these two, as the paper does). */
  val lbsn: Seq[StreamSpec] = Seq(InteractionStreams.brightkite, InteractionStreams.gowalla)

  /** The four non-bipartite datasets used for the heavier sweeps. */
  val social: Seq[StreamSpec] = Seq(
    InteractionStreams.twitterHiggs,
    InteractionStreams.twitterHK,
    InteractionStreams.stackOverflowC2Q,
    InteractionStreams.stackOverflowC2A,
  )
}
