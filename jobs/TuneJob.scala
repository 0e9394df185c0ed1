package repro.jobs

import repro.harness.BenchHarness
import repro.harness.BenchHarness._
import repro.spark.{AlgoKind, DecisionKind}

/** Scratch tuning entrypoint: quick sweeps with partial-match accounting,
  * used while calibrating d_opt / t_opt (the paper finds both empirically,
  * §5.2).
  */
object TuneJob {
  def show(ds: DatasetSpec, len: Int, algo: AlgoKind, dk: DecisionKind, n: Int): Unit = {
    val r = BenchHarness.runOne(ds, len, algo, dk, n)
    println(f"${ds.name}%-8s len=$len ${BenchHarness.methodName(dk)}%-26s " +
      f"pm=${r.partialMatches}%9d matches=${r.matches}%8d " +
      f"thr=${r.events.toDouble / (r.elapsedNs / 1e9)}%9.0f reopts=${r.reopts}%4d " +
      f"ovh=${100.0 * r.nanosDA / r.elapsedNs}%5.2f%%")
  }

  def main(args: Array[String]): Unit = {
    val ds = if (args.headOption.contains("traffic")) traffic else stocks
    val algo = if (args.lift(1).contains("zstream")) AlgoKind.ZStream else AlgoKind.Greedy
    val k = if (algo == AlgoKind.ZStream) 3 else 1
    val n = args.lift(2).map(_.toInt).getOrElse(100000)
    for (len <- Seq(3, 4, 5)) {
      show(ds, len, algo, DecisionKind.Static, n)
      for (d <- Seq(0.0, 0.1, 0.2, 0.5)) show(ds, len, algo, DecisionKind.Invariant(d, k), n)
      for (t <- Seq(0.02, 0.05, 0.1)) show(ds, len, algo, DecisionKind.Threshold(t), n)
      show(ds, len, algo, DecisionKind.Unconditional, n)
    }
  }
}
