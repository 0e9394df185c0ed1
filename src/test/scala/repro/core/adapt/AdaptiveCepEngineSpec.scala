package repro.core.adapt

import org.scalatest.funsuite.AnyFunSuite
import repro.core._
import repro.core.plan.OrderPlan
import repro.data.{StockGen, TrafficGen}
import repro.spark.{AlgoKind, Cep, CepConfig, DecisionKind}

/** The detection-adaptation loop (Algorithm 1) with live plan switchover. */
class AdaptiveCepEngineSpec extends AnyFunSuite {

  private def collectMatches(engine: AdaptiveCepEngine, evs: Seq[Event]): Set[Vector[Long]] =
    evs.flatMap(e => engine.onEvent(e).map(_.map(_.id).toVector)).toSet

  /** Stream whose dominant type flips halfway — forces a replan. */
  private def flippingStream(n: Int, count: Int, seed: Long): Vector[Event] = {
    val half = count / 2
    (TrafficGen.events(n, half, epochs = 1, seed = seed) ++
      TrafficGen.events(n, count - half, epochs = 1, seed = seed + 1, firstId = half)
        .map(e => e.copy(ts = e.ts + half, etype = n - 1 - e.etype))).toVector
  }

  private val pattern3 = Pattern.seq(3, 60)

  test("static decision never replaces the plan") {
    val eng = Cep.makeEngine(pattern3, CepConfig(AlgoKind.Greedy, DecisionKind.Static))
    flippingStream(3, 4000, 1).foreach(eng.onEvent)
    assert(eng.counters.replacements == 0)
    assert(eng.counters.plannerRuns == 0)
  }

  test("unconditional decision invokes the planner on every decision period") {
    val eng = Cep.makeEngine(pattern3,
      CepConfig(AlgoKind.Greedy, DecisionKind.Unconditional, statPeriod = 100))
    flippingStream(3, 4000, 2).foreach(eng.onEvent)
    assert(eng.counters.plannerRuns == eng.counters.decisionEvals)
    assert(eng.counters.plannerRuns >= 35)
  }

  test("invariant decision adapts to a rate flip with few planner runs") {
    val eng = Cep.makeEngine(pattern3,
      CepConfig(AlgoKind.Greedy, DecisionKind.Invariant(0.0, 1), statPeriod = 100))
    flippingStream(3, 6000, 3).foreach(eng.onEvent)
    assert(eng.counters.replacements >= 1, "the flip must trigger at least one replan")
    assert(eng.counters.plannerRuns < eng.counters.decisionEvals / 2,
      "invariant method must invoke A far less often than it evaluates D")
  }

  test("invariant decision stays quiet on a stable stream") {
    val evs = TrafficGen.events(3, 6000, epochs = 1, seed = 4)
    val eng = Cep.makeEngine(pattern3,
      CepConfig(AlgoKind.Greedy, DecisionKind.Invariant(0.2, 1), statPeriod = 100))
    evs.foreach(eng.onEvent)
    assert(eng.counters.replacements <= 2,
      s"stable stream should need almost no replans, got ${eng.counters.replacements}")
  }

  test("plan actually changes after a flip (greedy)") {
    val eng = Cep.makeEngine(pattern3,
      CepConfig(AlgoKind.Greedy, DecisionKind.Invariant(0.0, 1), statPeriod = 100))
    val evs = flippingStream(3, 6000, 5)
    evs.take(3000).foreach(eng.onEvent)
    val before = eng.currentPlan
    evs.drop(3000).foreach(eng.onEvent)
    val after = eng.currentPlan
    assert(before != after, s"plan should flip: $before vs $after")
  }

  for ((algoName, algo) <- Seq("greedy" -> AlgoKind.Greedy, "zstream" -> AlgoKind.ZStream);
       (decName, dec) <- Seq(
         "unconditional" -> DecisionKind.Unconditional,
         "threshold" -> DecisionKind.Threshold(0.05),
         "invariant" -> DecisionKind.Invariant(0.0, 2))) {
    test(s"switchover exactness: $algoName + $decName emits exactly the static match set") {
      val p = Pattern.seq(3, 40, Vector(Predicate(0, 1, 0, PredOp.Lt)))
      val evs = flippingStream(3, 3000, 11)
      val adaptive = Cep.makeEngine(p, CepConfig(algo, dec, statPeriod = 50))
      val static_ = Cep.makeEngine(p, CepConfig(algo, DecisionKind.Static))
      val got = collectMatches(adaptive, evs)
      val want = collectMatches(static_, evs)
      assert(adaptive.counters.replacements > 0 || dec == DecisionKind.Threshold(0.05),
        "the adaptive run should actually switch plans at least once")
      assert(got == want,
        s"adaptive run lost/duplicated matches (${got.size} vs ${want.size})")
    }
  }

  test("match set equals brute force while adapting") {
    val p = Pattern.seq(3, 40, Vector(Predicate(0, 1, 0, PredOp.Lt)))
    val evs = flippingStream(3, 2000, 21)
    val adaptive = Cep.makeEngine(p,
      CepConfig(AlgoKind.Greedy, DecisionKind.Unconditional, statPeriod = 40))
    val got = collectMatches(adaptive, evs)
    assert(got == BruteForce.matches(p, evs))
  }

  test("overlap window keeps two engines alive, then retires the old one") {
    val eng = Cep.makeEngine(pattern3,
      CepConfig(AlgoKind.Greedy, DecisionKind.Unconditional, statPeriod = 50))
    val evs = flippingStream(3, 4000, 31)
    var sawOverlap = false
    evs.foreach { e => eng.onEvent(e); if (eng.liveEngines > 1) sawOverlap = true }
    assert(sawOverlap, "switchover must keep the old engine alive for a window")
    // After a long quiet tail the chain must collapse back to a single engine
    // within one window of the last replacement.
    val tail = TrafficGen.events(3, 2000, epochs = 1, seed = 32, firstId = 10000)
      .map(e => e.copy(ts = e.ts + 4000))
    // Static tail: rates stable → unconditional still replans but plans equal.
    tail.foreach(eng.onEvent)
    assert(eng.liveEngines <= 2)
  }

  test("counters: overhead nanos and decision evals are populated") {
    val eng = Cep.makeEngine(pattern3,
      CepConfig(AlgoKind.Greedy, DecisionKind.Unconditional, statPeriod = 100))
    flippingStream(3, 3000, 41).foreach(eng.onEvent)
    val c = eng.counters
    assert(c.decisionEvals > 0 && c.plannerRuns > 0)
    assert(c.nanosInDecision > 0 && c.nanosInPlanner > 0)
    assert(c.events == 3000)
  }

  test("fruitless planner runs are counted separately from replacements") {
    val evs = StockGen.events(3, 4000, stepEvery = 500, seed = 51)
    val eng = Cep.makeEngine(pattern3,
      CepConfig(AlgoKind.Greedy, DecisionKind.Unconditional, statPeriod = 50))
    evs.foreach(eng.onEvent)
    val c = eng.counters
    assert(c.plannerRuns == c.replacements + c.fruitlessRuns)
    assert(c.fruitlessRuns > 0, "stable stretches must yield fruitless runs")
  }

  test("initial plan comes from the provided initial statistics") {
    val stats = repro.core.stats.Stats(Vector(0.7, 0.2, 0.1),
      Vector.tabulate(3, 3)((_, _) => 1.0))
    val eng = Cep.makeEngine(pattern3, CepConfig(AlgoKind.Greedy, DecisionKind.Static),
      Some(stats))
    assert(eng.currentPlan == OrderPlan(Vector(2, 1, 0)))
  }

  test("matches counter equals emitted matches") {
    val p = Pattern.seq(2, 30)
    val eng = Cep.makeEngine(p, CepConfig(AlgoKind.Greedy, DecisionKind.Static))
    val evs = BruteForce.randomStream(2, 500, 61)
    val n = evs.flatMap(eng.onEvent).size
    assert(eng.counters.matches == n && n > 0)
  }
}
