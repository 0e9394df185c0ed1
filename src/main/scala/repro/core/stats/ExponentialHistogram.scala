package repro.core.stats

import scala.collection.mutable

/** Sliding-window counter after Datar, Gionis, Indyk & Motwani (SICOMP 2002),
  * the algorithm the paper cites ([26]) for maintaining stream statistics over
  * sliding windows.
  *
  * Counts the number of arrivals whose timestamp lies in `(now - window, now]`
  * with relative error at most `1 / k` using `O(k log W)` buckets.
  *
  * @param window sliding window length in timestamp ticks
  * @param k      precision knob: at most `k + 1` buckets are kept per size;
  *               the estimate error is bounded by `1/k` of the true count
  */
final class ExponentialHistogram(val window: Long, val k: Int = 8) extends Serializable {
  require(window > 0 && k >= 1)

  /** One bucket: the timestamp of its most recent element and its size
    * (a power of two). Stored newest-first.
    */
  private final case class Bucket(var latest: Long, var size: Long)

  private val buckets = new mutable.ArrayDeque[Bucket]
  private var total: Long = 0L

  /** Record one arrival at timestamp `ts` (timestamps must be non-decreasing). */
  def add(ts: Long): Unit = {
    buckets.prepend(Bucket(ts, 1L))
    total += 1L
    mergeCascade()
    expire(ts)
  }

  /** Merge oldest pairs whenever more than `k + 1` buckets share a size. */
  private def mergeCascade(): Unit = {
    var size = 1L
    var done = false
    while (!done) {
      // Find the oldest two buckets of `size`, counting occurrences.
      var count = 0
      var lastIdx = -1
      var secondLastIdx = -1
      var i = 0
      while (i < buckets.length) {
        if (buckets(i).size == size) {
          count += 1
          secondLastIdx = lastIdx
          lastIdx = i
        }
        i += 1
      }
      if (count > k + 1) {
        // Merge the two oldest buckets of this size into one of double size;
        // the merged bucket keeps the newer `latest` of the two (the element
        // timestamps it covers are older, so this is the standard DGIM rule).
        val newer = buckets(secondLastIdx)
        buckets.remove(lastIdx)
        newer.size = size * 2
        size *= 2 // the doubled size may now overflow its own budget
      } else done = true
    }
  }

  /** Drop buckets that lie entirely outside the window ending at `now`. */
  private def expire(now: Long): Unit = {
    while (buckets.nonEmpty && buckets.last.latest <= now - window) {
      total -= buckets.last.size
      buckets.removeLast()
    }
  }

  /** Approximate count of arrivals in `(now - window, now]`. Per DGIM the
    * oldest surviving bucket may straddle the window edge, so half its size is
    * subtracted.
    */
  def estimate(now: Long): Double = {
    expire(now)
    if (buckets.isEmpty) 0.0
    else if (buckets.length == 1) buckets.head.size.toDouble
    else total.toDouble - buckets.last.size.toDouble / 2.0
  }

  /** Number of buckets currently held (exposed for space-bound tests). */
  def bucketCount: Int = buckets.length
}
