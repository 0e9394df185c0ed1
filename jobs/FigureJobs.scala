package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.harness.BenchHarness
import repro.harness.BenchHarness._
import repro.spark.AlgoKind

/** spark-submit entrypoints, one per evaluation figure/table. The CEP runs
  * themselves are driver-side (the detection loop is order-sensitive; see
  * DESIGN.md); a SparkSession is still created so the jobs run under
  * spark-submit with the project's standard configuration and the event
  * streams can be exported as DataFrames if desired.
  */
object JobDefaults {
  val lengths: Seq[Int] = Seq(3, 4, 5, 6)
  val nEvents = 60000

  def session(name: String): SparkSession =
    SparkSession.builder.master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(name).getOrCreate()
}

/** Figure 5: throughput of the invariant method vs pattern size × distance d. */
object Fig5Job {
  def main(args: Array[String]): Unit = {
    val spark = JobDefaults.session("fig5")
    val dvals = Seq(0.0, 0.05, 0.1, 0.2, 0.5)
    for ((ds, algo) <- Seq((traffic, AlgoKind.Greedy), (traffic, AlgoKind.ZStream),
                           (stocks, AlgoKind.Greedy), (stocks, AlgoKind.ZStream))) {
      val rows = BenchHarness.dSweep(ds, algo, Seq(3, 5), dvals, JobDefaults.nEvents, k = 3)
      BenchHarness.printTable(s"Fig5 ${ds.name} x ${algoName(algo)}", rows)
    }
    spark.stop()
  }
}

/** Figures 6-9: adaptation-method comparison for one dataset × algorithm. */
object Fig6Job {
  def main(args: Array[String]): Unit = {
    val spark = JobDefaults.session("fig6")
    BenchHarness.printTable("Fig6 traffic x greedy",
      BenchHarness.methodComparison(traffic, AlgoKind.Greedy, JobDefaults.lengths,
        JobDefaults.nEvents, tOpt = 0.10, dOpt = 0.20, k = 1))
    spark.stop()
  }
}

object Fig7Job {
  def main(args: Array[String]): Unit = {
    val spark = JobDefaults.session("fig7")
    BenchHarness.printTable("Fig7 traffic x zstream",
      BenchHarness.methodComparison(traffic, AlgoKind.ZStream, JobDefaults.lengths,
        JobDefaults.nEvents, tOpt = 0.10, dOpt = 0.20, k = 3))
    spark.stop()
  }
}

object Fig8Job {
  def main(args: Array[String]): Unit = {
    val spark = JobDefaults.session("fig8")
    BenchHarness.printTable("Fig8 stocks x greedy",
      BenchHarness.methodComparison(stocks, AlgoKind.Greedy, JobDefaults.lengths,
        JobDefaults.nEvents, tOpt = 0.10, dOpt = 0.20, k = 1))
    spark.stop()
  }
}

object Fig9Job {
  def main(args: Array[String]): Unit = {
    val spark = JobDefaults.session("fig9")
    BenchHarness.printTable("Fig9 stocks x zstream",
      BenchHarness.methodComparison(stocks, AlgoKind.ZStream, JobDefaults.lengths,
        JobDefaults.nEvents, tOpt = 0.10, dOpt = 0.20, k = 3))
    spark.stop()
  }
}
