package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.harness.BenchHarness
import repro.harness.BenchHarness.{stocks, traffic}
import repro.spark.AlgoKind

/** Figure 5: throughput of the invariant-based method as a function of the
  * pattern size and the invariant distance d, for all four dataset×algorithm
  * combinations. Expected shape (paper §5.2): an intermediate d_opt > 0
  * consistently beats both d = 0 (over-adapting to noise) and large d
  * (missed changes).
  */
class Fig5DSweepBench extends AnyFunSuite {

  private val dValues = Seq(0.0, 0.05, 0.1, 0.2, 0.5)
  private val lengths = Seq(3, 5)
  private val n = BenchDefaults.nEvents

  private def sweep(ds: BenchHarness.DatasetSpec, algo: AlgoKind, k: Int, label: String): Unit = {
    val rows = BenchHarness.dSweep(ds, algo, lengths, dValues, n, k, BenchDefaults.seed)
    BenchDefaults.emit(s"Fig5 $label: throughput vs d", rows)
    // Structural check, not a timing assertion: every cell ran the full
    // stream and the match sets agree across d (paired streams).
    assert(rows.forall(_.events == n))
    lengths.foreach { len =>
      assert(rows.filter(_.patternLen == len).map(_.matches).distinct.size == 1)
    }
  }

  test("Fig5(a) traffic x greedy d-sweep") {
    sweep(traffic, AlgoKind.Greedy, BenchDefaults.greedyK, "traffic/greedy")
  }
  test("Fig5(b) traffic x zstream d-sweep") {
    sweep(traffic, AlgoKind.ZStream, BenchDefaults.zstreamK, "traffic/zstream")
  }
  test("Fig5(c) stocks x greedy d-sweep") {
    sweep(stocks, AlgoKind.Greedy, BenchDefaults.greedyK, "stocks/greedy")
  }
  test("Fig5(d) stocks x zstream d-sweep") {
    sweep(stocks, AlgoKind.ZStream, BenchDefaults.zstreamK, "stocks/zstream")
  }

  test("reoptimization count decreases monotonically-ish with d") {
    // Higher d must not trigger more replans than d=0 on the same stream.
    val rows = BenchHarness.dSweep(traffic, AlgoKind.Greedy, Seq(4),
      Seq(0.0, 0.5), 20000, 1, BenchDefaults.seed)
    val byD = rows.map(r => r.method -> r.reoptimizations).toMap
    assert(byD("invariant(d=0.50)") <= byD("invariant(d=0.00)"))
  }
}
