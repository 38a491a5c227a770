package repro.experiments

import org.apache.spark.sql.SparkSession
import repro.core._
import repro.ic.{DimTracker, ImmTracker, TimPlusTracker}
import repro.stream.{InteractionStreams, StreamDriver}
import repro.stream.InteractionStreams.StreamSpec
import repro.tdn.Lifetimes

/** The paper's evaluation (§V) as reusable experiment functions: each figure /
  * table has one function returning plain result rows, shared by the
  * spark-submit jobs in `jobs/` and the bench suites in `bench/`.
  *
  * Scale note (DESIGN.md §5): datasets are ~1/100 of the paper's and horizons
  * are 100–400 steps instead of 5,000–10,000, with the paper's parameter
  * ratios preserved. Comparisons are shape-level: who wins, by roughly what
  * factor, where the trends point.
  */
object Experiments {

  /** Replayable batches for `spec` with Geometric(p) lifetimes capped at L,
    * re-timed to one interaction per step (§V-B: "one interaction arrives at
    * a time") — so `steps` is also the number of interactions replayed.
    */
  def batchesFor(
      spark: SparkSession,
      spec: StreamSpec,
      steps: Int,
      p: Double,
      maxL: Int,
  ): StreamDriver.Batches = {
    val df = Lifetimes.withGeometricLifetimes(
      InteractionStreams.unitStepPrefix(spark, spec, steps),
      p, maxL, seed = spec.seed + 7777,
    )
    StreamDriver.batchesFromDf(df, spec.universe, steps)
  }

  private def avg(xs: Iterable[Double]): Double =
    if (xs.isEmpty) 0.0 else xs.sum / xs.size

  // ---------------------------------------------------------------- Table I

  final case class TableIRow(
      dataset: String,
      paperNodes: Long,
      paperInteractions: Long,
      nodes: Long,
      interactions: Long,
  )

  /** Table I: dataset summary — paper numbers vs our 1/100-scale synthetics. */
  def tableI(spark: SparkSession): Seq[TableIRow] = {
    import org.apache.spark.sql.functions._
    InteractionStreams.all.map { spec =>
      val df = InteractionStreams.generate(spark, spec)
      val row = df
        .agg(count(lit(1)).as("m"))
        .collect()(0)
      val nodes = df
        .select(col("src").as("node"))
        .union(df.select(col("dst").as("node")))
        .distinct()
        .count()
      val (pn, pm) = InteractionStreams.paperTableI(spec.name)
      TableIRow(spec.name, pn, pm, nodes, row.getLong(0))
    }
  }

  // ------------------------------------------------------------------ Fig 7

  final case class Fig7Row(
      dataset: String,
      p: Double,
      basicValue: Double,
      histValue: Double,
      basicCalls: Double,
      histCalls: Double,
  ) {
    def valueRatio: Double = if (basicValue == 0) 0 else histValue / basicValue
    def callRatio: Double  = if (basicCalls == 0) 0 else histCalls / basicCalls
  }

  /** Fig. 7: BasicReduction vs HistApprox across lifetime skew p
    * (avg solution value and avg oracle calls per step).
    */
  def fig7(
      spark: SparkSession,
      specs: Seq[StreamSpec],
      ps: Seq[Double],
      steps: Int,
      k: Int,
      eps: Double,
      maxL: Int,
  ): Seq[Fig7Row] =
    for {
      spec <- specs
      p    <- ps
    } yield {
      val batches = batchesFor(spark, spec, steps, p, maxL)
      val basic   = new BasicReduction(k, eps, maxL, spec.universe)
      val hist    = new HistApprox(k, eps, maxL, spec.universe)
      val recs    = StreamDriver.run(batches, Seq(basic, hist), queryEvery = 1)
      Fig7Row(
        spec.name,
        p,
        avg(recs("BasicReduction").map(_.value.toDouble)),
        avg(recs("HistApprox").map(_.value.toDouble)),
        recs("BasicReduction").last.oracleCallsCum.toDouble / steps,
        recs("HistApprox").last.oracleCallsCum.toDouble / steps,
      )
    }

  // ------------------------------------------------------------ Figs 8 - 10

  final case class Fig8Row(
      dataset: String,
      eps: Double,
      avgHistValue: Double,
      avgGreedyValue: Double,
      avgRandomValue: Double,
      valueRatioToGreedy: Double,   // Fig 9
      callRatioToGreedy: Double,    // Fig 10 (cumulative calls at the horizon)
  )

  /** A HistApprox whose display name carries its ε — several HistApprox
    * trackers in one run would otherwise collide in the record map.
    */
  final class NamedHistApprox(k: Int, eps: Double, maxL: Int, universe: Int)
      extends StreamingInfluenceAlgo {
    private val inner         = new HistApprox(k, eps, maxL, universe)
    override val name: String = f"HistApprox(eps=$eps%.2f)"
    override def observe(batch: Seq[repro.tdn.TimedEdge]): Unit = inner.observe(batch)
    override def querySolution: Seq[Int]                        = inner.querySolution
    override def endStep(): Unit                                = inner.endStep()
    override def oracleCalls: Long                              = inner.oracleCalls
  }

  /** Figs. 8–10, correctly disambiguating per-ε trackers. */
  def fig8to10Rows(
      spark: SparkSession,
      specs: Seq[StreamSpec],
      epss: Seq[Double],
      steps: Int,
      k: Int,
      maxL: Int,
      pOf: StreamSpec => Double,
  ): Seq[Fig8Row] =
    specs.flatMap { spec =>
      val batches = batchesFor(spark, spec, steps, pOf(spec), maxL)
      val greedy  = new GreedyTracker(k, spec.universe)
      val random  = new RandomTracker(k, spec.universe, seed = 55L)
      val hists   = epss.map(e => e -> new NamedHistApprox(k, e, maxL, spec.universe))
      val recs    = StreamDriver.run(batches, greedy +: random +: hists.map(_._2), queryEvery = 1)

      val g       = recs("Greedy")
      val gv      = avg(g.map(_.value.toDouble))
      val gCalls  = g.last.oracleCallsCum.toDouble
      val rv      = avg(recs("Random").map(_.value.toDouble))
      hists.map { case (e, tracker) =>
        val h = recs(tracker.name)
        Fig8Row(
          spec.name, e,
          avgHistValue = avg(h.map(_.value.toDouble)),
          avgGreedyValue = gv,
          avgRandomValue = rv,
          valueRatioToGreedy = avg(h.zip(g).collect {
            case (hr, gr) if gr.value > 0 => hr.value.toDouble / gr.value
          }),
          callRatioToGreedy = h.last.oracleCallsCum.toDouble / math.max(1.0, gCalls),
        )
      }
    }

  // ------------------------------------------------------------ Figs 11, 12

  final case class SweepRow(
      dataset: String,
      param: Int, // k for Fig 11, L for Fig 12
      valueRatioToGreedy: Double,
      callRatioToGreedy: Double,
  )

  /** Fig. 11: HistApprox vs Greedy across budgets k (ε, L fixed). */
  def fig11(
      spark: SparkSession,
      specs: Seq[StreamSpec],
      ks: Seq[Int],
      steps: Int,
      eps: Double,
      maxL: Int,
      pOf: StreamSpec => Double,
  ): Seq[SweepRow] =
    for {
      spec <- specs
      k    <- ks
    } yield {
      val batches = batchesFor(spark, spec, steps, pOf(spec), maxL)
      val hist    = new HistApprox(k, eps, maxL, spec.universe)
      val greedy  = new GreedyTracker(k, spec.universe)
      val recs    = StreamDriver.run(batches, Seq(hist, greedy), queryEvery = 1)
      val h       = recs("HistApprox")
      val g       = recs("Greedy")
      SweepRow(
        spec.name, k,
        valueRatioToGreedy = avg(h.zip(g).collect {
          case (hr, gr) if gr.value > 0 => hr.value.toDouble / gr.value
        }),
        callRatioToGreedy =
          h.last.oracleCallsCum.toDouble / math.max(1.0, g.last.oracleCallsCum.toDouble),
      )
    }

  /** Fig. 12: HistApprox vs Greedy across lifetime caps L (ε, k fixed). */
  def fig12(
      spark: SparkSession,
      specs: Seq[StreamSpec],
      ls: Seq[Int],
      steps: Int,
      k: Int,
      eps: Double,
      pOf: StreamSpec => Double,
  ): Seq[SweepRow] =
    for {
      spec <- specs
      l    <- ls
    } yield {
      val batches = batchesFor(spark, spec, steps, pOf(spec), l)
      val hist    = new HistApprox(k, eps, l, spec.universe)
      val greedy  = new GreedyTracker(k, spec.universe)
      val recs    = StreamDriver.run(batches, Seq(hist, greedy), queryEvery = 1)
      val h       = recs("HistApprox")
      val g       = recs("Greedy")
      SweepRow(
        spec.name, l,
        valueRatioToGreedy = avg(h.zip(g).collect {
          case (hr, gr) if gr.value > 0 => hr.value.toDouble / gr.value
        }),
        callRatioToGreedy =
          h.last.oracleCallsCum.toDouble / math.max(1.0, g.last.oracleCallsCum.toDouble),
      )
    }

  // ------------------------------------------------------------ Figs 13, 14

  final case class Fig13Row(
      dataset: String,
      algo: String,
      valueRatioToGreedy: Double, // Fig 13
      throughputEdgesPerSec: Double, // Fig 14
  )

  /** Figs. 13–14: quality (value ratio vs Greedy) and throughput for
    * HistApprox(ε=0.3), DIM, IMM, TIM+, Random — all queried every step as in
    * the paper's throughput setup.
    */
  def fig13to14(
      spark: SparkSession,
      specs: Seq[StreamSpec],
      steps: Int,
      k: Int,
      maxL: Int,
      pOf: StreamSpec => Double,
      maxRR: Int = 20000,
  ): Seq[Fig13Row] =
    specs.flatMap { spec =>
      val batches = batchesFor(spark, spec, steps, pOf(spec), maxL)
      val algos: Seq[StreamingInfluenceAlgo] = Seq(
        new GreedyTracker(k, spec.universe),
        new HistApprox(k, 0.3, maxL, spec.universe),
        new DimTracker(k, spec.universe, beta = 32, seed = 21L),
        new ImmTracker(k, spec.universe, eps = 0.3, seed = 22L, maxRR = maxRR),
        new TimPlusTracker(k, spec.universe, eps = 0.3, seed = 23L, maxRR = maxRR),
        new RandomTracker(k, spec.universe, seed = 24L),
      )
      val recs = StreamDriver.run(batches, algos, queryEvery = 1)
      val g    = recs("Greedy")
      algos.map { a =>
        val r = recs(a.name)
        Fig13Row(
          spec.name,
          a.name,
          valueRatioToGreedy = avg(r.zip(g).collect {
            case (ar, gr) if gr.value > 0 => ar.value.toDouble / gr.value
          }),
          throughputEdgesPerSec = StreamDriver.throughputEdgesPerSec(batches, r),
        )
      }
    }
}
