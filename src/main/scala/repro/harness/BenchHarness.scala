package repro.harness

import repro.core.{Event, Pattern, PredOp, Predicate}
import repro.data.{StockGen, TrafficGen}
import repro.spark.{AlgoKind, Cep, CepConfig, DecisionKind}

/** Shared experiment harness reproducing the paper's evaluation (§5): each
  * of Figures 5–9 is regenerated as a printed table by one bench suite /
  * spark-submit job built on this harness.
  *
  * A run feeds a deterministic synthetic event stream (traffic or stocks
  * regime, see `repro.data`) through the detection-adaptation loop and
  * measures: throughput (events/s), number of plan reoptimizations, and
  * computational overhead (share of wall time in `D` + `A`) — the paper's
  * metrics. A warm-up prefix feeds the statistics monitor only, providing the
  * planner's initial statistics (`in_stat` of Algorithm 1) exactly as a
  * deployed system would have them.
  */
object BenchHarness {

  /** One table row ≙ one (pattern length, method) cell of a figure. */
  final case class Row(
      dataset: String,
      algo: String,
      method: String,
      patternLen: Int,
      events: Long,
      matches: Long,
      throughputEvS: Double,
      gainVsStatic: Double, // relative throughput vs the static plan (Figs 6b-9b)
      reoptimizations: Long, // actual plan replacements (Figs 6c-9c)
      plannerRuns: Long,
      overheadPct: Double, // time in D + A over total (Figs 6d-9d)
  )

  /** Traffic-regime pattern: SEQ of n observation points where both average
    * speed and vehicle count decline along the sequence (the "violation of
    * normal driving behavior" pattern of §5.1).
    */
  def trafficPattern(n: Int, window: Long): Pattern =
    Pattern.seq(n, window,
      (0 until n - 1).flatMap(i => Vector(
        Predicate(i, i + 1, attr = 0, PredOp.Gt),
        Predicate(i, i + 1, attr = 1, PredOp.Gt),
      )).toVector)

  /** Stocks-regime pattern: SEQ of n stock identifiers with ascending price
    * differences (`A.diff < B.diff < …`, §5.1).
    */
  def stockPattern(n: Int, window: Long): Pattern =
    Pattern.seq(n, window,
      (0 until n - 1).map(i => Predicate(i, i + 1, attr = 0, PredOp.Lt)).toVector)

  /** Dataset registry: name → (event generator, pattern factory, window). */
  final case class DatasetSpec(
      name: String,
      window: Long,
      pattern: Int => Pattern,
      gen: (Int, Int, Long) => IndexedSeq[Event], // (nTypes, count, seed)
  )

  val traffic: DatasetSpec = DatasetSpec(
    "traffic", window = 300,
    pattern = n => trafficPattern(n, 300),
    gen = (n, count, seed) => TrafficGen.events(n, count, epochs = 4, seed = seed),
  )

  val stocks: DatasetSpec = DatasetSpec(
    "stocks", window = 150,
    pattern = n => stockPattern(n, 150),
    gen = (n, count, seed) =>
      StockGen.events(n, count, stepEvery = 400, stepSigma = 0.10, driftSigma = 0.0, seed = seed),
  )

  def algoName(a: AlgoKind): String = a match {
    case AlgoKind.Greedy  => "greedy"
    case AlgoKind.ZStream => "zstream"
  }

  def methodName(d: DecisionKind): String = d match {
    case DecisionKind.Static          => "static"
    case DecisionKind.Unconditional   => "unconditional"
    case DecisionKind.Threshold(t)    => f"threshold(t=$t%.3f)"
    case DecisionKind.Invariant(d0, k)=> f"invariant(d=$d0%.2f,K=$k)"
  }

  final case class RunResult(
      events: Long, matches: Long, elapsedNs: Long,
      reopts: Long, plannerRuns: Long, nanosDA: Long, partialMatches: Long)

  /** One-time JVM warm-up so JIT compilation of the hot engine/planner paths
    * does not bias whichever measured run happens to execute first.
    */
  private lazy val jitWarmed: Boolean = {
    for (ds <- Seq(traffic, stocks); algo <- Seq(AlgoKind.Greedy, AlgoKind.ZStream)) {
      val pattern = ds.pattern(3)
      val eng = Cep.makeEngine(pattern,
        CepConfig(algo, DecisionKind.Unconditional, statPeriod = 64))
      ds.gen(3, 12000, 99L).foreach(eng.onEvent)
    }
    true
  }

  /** Run one (dataset, length, algo, method) cell. The same `seed` produces
    * the same event stream for every method, so comparisons are paired.
    */
  def runOne(
      ds: DatasetSpec,
      len: Int,
      algo: AlgoKind,
      decision: DecisionKind,
      nEvents: Int,
      warmup: Int = 2000,
      seed: Long = 7L,
      reps: Int = 2,
  ): RunResult = {
    require(jitWarmed)
    val pattern = ds.pattern(len)
    val all = ds.gen(len, warmup + nEvents, seed)
    // Warm-up prefix: statistics only — gives A its initial in_stat, untimed.
    val warmMonitor = new repro.core.stats.StatisticsMonitor(
      pattern, pattern.window * 4)
    var i = 0
    while (i < warmup) { warmMonitor.observe(all(i)); i += 1 }
    val warmStats = warmMonitor.snapshot(all(warmup - 1).ts)

    // Best-of-`reps` wall time (fresh engine per rep, identical stream):
    // standard microbenchmark hygiene against GC/JIT/scheduler noise.
    var best: RunResult = null
    var rep = 0
    while (rep < reps) {
      val timed = Cep.makeEngine(pattern, CepConfig(algo, decision), Some(warmStats))
      i = 0
      while (i < warmup) { timed.monitor.observe(all(i)); i += 1 }
      System.gc()
      val t0 = System.nanoTime()
      var m = 0L
      i = warmup
      while (i < all.length) {
        m += timed.onEvent(all(i)).length
        i += 1
      }
      val elapsed = System.nanoTime() - t0
      val c = timed.counters
      val r = RunResult(c.events, m, elapsed, c.replacements, c.plannerRuns,
        c.nanosInDecision + c.nanosInPlanner, timed.partialMatchesCreated)
      if (best == null || r.elapsedNs < best.elapsedNs) best = r
      rep += 1
    }
    best
  }

  /** The method-comparison table of Figs 6–9 for one dataset × algorithm:
    * rows = pattern length × {static, unconditional, threshold(t), invariant(d,K)}.
    */
  def methodComparison(
      ds: DatasetSpec,
      algo: AlgoKind,
      lengths: Seq[Int],
      nEvents: Int,
      tOpt: Double,
      dOpt: Double,
      k: Int,
      seed: Long = 7L,
  ): Seq[Row] = {
    val methods = Seq[DecisionKind](
      DecisionKind.Static,
      DecisionKind.Unconditional,
      DecisionKind.Threshold(tOpt),
      DecisionKind.Invariant(dOpt, k),
    )
    lengths.flatMap { len =>
      val static = runOne(ds, len, algo, DecisionKind.Static, nEvents, seed = seed)
      val staticThr = static.events.toDouble / (static.elapsedNs / 1e9)
      methods.map { dk =>
        val r = if (dk == DecisionKind.Static) static
                else runOne(ds, len, algo, dk, nEvents, seed = seed)
        val thr = r.events.toDouble / (r.elapsedNs / 1e9)
        Row(ds.name, algoName(algo), methodName(dk), len, r.events, r.matches,
          thr, thr / staticThr, r.reopts, r.plannerRuns,
          100.0 * r.nanosDA / r.elapsedNs)
      }
    }
  }

  /** The distance sweep of Fig. 5 for one dataset × algorithm: rows =
    * pattern length × d.
    */
  def dSweep(
      ds: DatasetSpec,
      algo: AlgoKind,
      lengths: Seq[Int],
      ds_ : Seq[Double],
      nEvents: Int,
      k: Int,
      seed: Long = 7L,
  ): Seq[Row] = {
    lengths.flatMap { len =>
      ds_.map { d =>
        val r = runOne(ds, len, algo, DecisionKind.Invariant(d, k), nEvents, seed = seed)
        val thr = r.events.toDouble / (r.elapsedNs / 1e9)
        Row(ds.name, algoName(algo), f"invariant(d=$d%.2f)", len, r.events, r.matches,
          thr, Double.NaN, r.reopts, r.plannerRuns, 100.0 * r.nanosDA / r.elapsedNs)
      }
    }
  }

  def printTable(title: String, rows: Seq[Row]): Unit = {
    println(s"\n=== $title ===")
    println(f"${"dataset"}%-8s ${"algo"}%-8s ${"method"}%-26s ${"len"}%3s " +
      f"${"events"}%8s ${"matches"}%9s ${"ev/s"}%11s ${"gain"}%6s ${"reopts"}%6s ${"Aruns"}%6s ${"ovh%"}%6s")
    rows.foreach { r =>
      val gain = if (r.gainVsStatic.isNaN) "  -" else f"${r.gainVsStatic}%5.2fx"
      println(f"${r.dataset}%-8s ${r.algo}%-8s ${r.method}%-26s ${r.patternLen}%3d " +
        f"${r.events}%8d ${r.matches}%9d ${r.throughputEvS}%11.0f $gain%6s ${r.reoptimizations}%6d " +
        f"${r.plannerRuns}%6d ${r.overheadPct}%6.2f")
    }
  }
}
