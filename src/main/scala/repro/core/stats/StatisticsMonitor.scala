package repro.core.stats

import repro.core.{Event, Pattern}

/** Immutable snapshot of the monitored statistics (`Stat` in the paper):
  * per-position arrival rates and per-pair predicate selectivities.
  *
  * `rates(p)` is the arrival rate of the event type at pattern position `p`,
  * expressed as a fraction of the (single, multiplexed) input stream, i.e. a
  * value in [0,1]. `sel(i)(j)` is the selectivity of the conjunction of
  * predicates defined between positions `i` and `j` (1.0 when no predicate is
  * defined; symmetric).
  */
final case class Stats(rates: Vector[Double], sel: Vector[Vector[Double]])
    extends Serializable {
  def n: Int = rates.size

  /** Flat view of every monitored value — what a constant-threshold decision
    * function iterates over ("this function loops over all values in
    * curr_stat", paper §2.3). Pairs without predicates are constant 1.0 and
    * excluded (they are not *monitored*).
    */
  def monitoredValues(pattern: Pattern): Vector[Double] =
    rates ++ pattern.predicatePairs.map { case (i, j) => sel(i)(j) }
}

object Stats {
  /** Neutral statistics used before anything was observed (the paper's
    * "default, empty Stat"): uniform rates, selectivity 1/2 on predicate
    * pairs.
    */
  def default(pattern: Pattern): Stats = {
    val n = pattern.n
    val sel = Vector.tabulate(n, n) { (i, j) =>
      if (i != j && pattern.predsByPair.contains((math.min(i, j), math.max(i, j)))) 0.5 else 1.0
    }
    Stats(Vector.fill(n)(1.0 / n), sel)
  }
}

/** On-the-fly estimator of [[Stats]] (the "statistics collector" box of the
  * paper's Figure 2).
  *
  * Rates are maintained with one [[ExponentialHistogram]] per pattern position
  * (Datar et al. [26], as used by the paper). Selectivities are maintained
  * with one exponentially-weighted moving average per predicate pair, updated
  * on each arrival by pairing the new event with a uniformly sampled recent
  * partner from the other position's ring buffer — a constant-work-per-event
  * approximation of the sliding-window selectivity estimators the paper
  * cites ([13]).
  *
  * @param pattern     monitored pattern
  * @param statWindow  sliding window (ticks) for rate estimation; typically a
  *                    few pattern windows long
  * @param ewmaAlpha   EWMA smoothing factor for selectivity estimates
  * @param ringSize    per-position ring buffer capacity for partner sampling
  */
final class StatisticsMonitor(
    val pattern: Pattern,
    val statWindow: Long,
    val ewmaAlpha: Double = 0.02,
    val ringSize: Int = 48,
    seed: Long = 17L,
) extends Serializable {
  private val n = pattern.n
  private val rnd = new scala.util.Random(seed)

  private val rateHists = Array.fill(n)(new ExponentialHistogram(statWindow))

  // Ring buffers of recent events per position, used to sample predicate pairs.
  private val rings = Array.fill(n)(new Array[Event](ringSize))
  private val ringLen = new Array[Int](n)
  private val ringNext = new Array[Int](n)

  // EWMA selectivity per unordered predicate pair; NaN until first sample.
  private val selEwma = scala.collection.mutable.Map.empty[(Int, Int), Double]
  pattern.predicatePairs.foreach(p => selEwma(p) = Double.NaN)

  private var observed: Long = 0L

  /** Feed one event. Events of types outside the pattern are ignored. */
  def observe(e: Event): Unit = {
    pattern.typeToPos.get(e.etype) match {
      case None => ()
      case Some(pos) =>
        observed += 1L
        rateHists(pos).add(e.ts)
        // Selectivity sampling against each predicate partner position.
        var t = 0
        val touching = pattern.predsTouching(pos)
        while (t < touching.length) {
          val otherPos = touching(t)._1
          if (ringLen(otherPos) > 0) {
            val partner = rings(otherPos)(rnd.nextInt(ringLen(otherPos)))
            val holds = pattern.pairHolds(pos, otherPos, e, partner)
            val key = (math.min(pos, otherPos), math.max(pos, otherPos))
            val x = if (holds) 1.0 else 0.0
            val prev = selEwma(key)
            selEwma(key) = if (prev.isNaN) x else prev + ewmaAlpha * (x - prev)
          }
          t += 1
        }
        // Ring insert after sampling so an event never pairs with itself.
        rings(pos)(ringNext(pos)) = e
        ringNext(pos) = (ringNext(pos) + 1) % ringSize
        if (ringLen(pos) < ringSize) ringLen(pos) += 1
    }
  }

  /** Total pattern-relevant events observed so far. */
  def observedCount: Long = observed

  /** Current statistics estimate at time `now`. */
  def snapshot(now: Long): Stats = {
    val span = math.min(statWindow, math.max(1L, now)).toDouble
    val rates = Vector.tabulate(n) { p =>
      math.min(1.0, rateHists(p).estimate(now) / span)
    }
    val sel = Vector.tabulate(n, n) { (i, j) =>
      if (i == j) 1.0
      else selEwma.get((math.min(i, j), math.max(i, j))) match {
        case Some(v) if !v.isNaN => math.max(1e-4, v) // avoid degenerate zero costs
        case Some(_)             => 0.5
        case None                => 1.0
      }
    }
    Stats(rates, sel)
  }
}
