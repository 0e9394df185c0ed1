package repro.jobs

import repro.harness.BenchHarness
import repro.harness.BenchHarness._
import repro.spark.{AlgoKind, DecisionKind}

/** Interleaved A/B measurement: static vs an invariant decision with a huge
  * distance (never fires). Any persistent throughput gap between the two is a
  * harness artifact, not an adaptation cost.
  */
object Tune2Job {
  def main(args: Array[String]): Unit = {
    def show(tag: String, dk: DecisionKind): Unit = {
      val r = BenchHarness.runOne(stocks, 3, AlgoKind.Greedy, dk, 100000)
      println(f"$tag%-14s thr=${r.events.toDouble / (r.elapsedNs / 1e9)}%9.0f " +
        f"pm=${r.partialMatches}%9d reopts=${r.reopts}%3d")
    }
    (1 to 3).foreach { i =>
      show(s"static#$i", DecisionKind.Static)
      show(s"inv-never#$i", DecisionKind.Invariant(9.0, 1))
      show(s"inv-d0.2#$i", DecisionKind.Invariant(0.2, 1))
    }
  }
}
