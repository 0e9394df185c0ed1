package repro.core.stats

import org.scalatest.funsuite.AnyFunSuite

/** DGIM exponential histogram: accuracy, expiry and space bounds. */
class ExponentialHistogramSpec extends AnyFunSuite {

  private def exactCount(arrivals: Seq[Long], now: Long, window: Long): Long =
    arrivals.count(ts => ts > now - window && ts <= now)

  test("empty histogram estimates zero") {
    val eh = new ExponentialHistogram(100)
    assert(eh.estimate(50) == 0.0)
  }

  test("single arrival counted exactly") {
    val eh = new ExponentialHistogram(100)
    eh.add(10)
    assert(eh.estimate(10) == 1.0)
    assert(eh.estimate(109) == 1.0)
    assert(eh.estimate(110) == 0.0) // fully expired
  }

  test("all-expired window estimates zero") {
    val eh = new ExponentialHistogram(50)
    (1L to 40L).foreach(eh.add)
    assert(eh.estimate(1000) == 0.0)
  }

  for (k <- Seq(2, 4, 8, 16)) {
    test(s"estimate within 1/$k relative error on dense stream (k=$k)") {
      val window = 500L
      val eh = new ExponentialHistogram(window, k)
      val arrivals = (1L to 5000L)
      arrivals.foreach(eh.add)
      for (now <- Seq(1000L, 2500L, 5000L)) {
        val exact = exactCount(arrivals, now, window)
        val est = eh.estimate(now)
        assert(math.abs(est - exact) <= exact.toDouble / k + 1.0,
          s"now=$now exact=$exact est=$est")
      }
    }
  }

  for (k <- Seq(4, 8)) {
    test(s"estimate accurate on bursty random stream (k=$k)") {
      val window = 300L
      val rnd = new scala.util.Random(k)
      val eh = new ExponentialHistogram(window, k)
      var ts = 0L
      val arrivals = scala.collection.mutable.ArrayBuffer.empty[Long]
      (1 to 3000).foreach { _ =>
        ts += (if (rnd.nextDouble() < 0.2) rnd.nextInt(20).toLong + 1 else 1L)
        arrivals += ts
        eh.add(ts)
        if (arrivals.length % 500 == 0) {
          val exact = exactCount(arrivals.toSeq, ts, window)
          val est = eh.estimate(ts)
          assert(math.abs(est - exact) <= exact.toDouble / k + 1.0)
        }
      }
    }
  }

  test("bucket count stays logarithmic in window content") {
    val eh = new ExponentialHistogram(100000L, 8)
    (1L to 100000L).foreach(eh.add)
    // DGIM bound: (k+1) buckets per size, O(log N) sizes.
    assert(eh.bucketCount <= 9 * 20, s"bucketCount=${eh.bucketCount}")
  }

  for (seed <- 1 to 12) {
    test(s"property: estimate error bounded for arbitrary arrival gaps (seed=$seed)") {
      val rnd = new scala.util.Random(seed)
      val window = 200L
      val k = 8
      val eh = new ExponentialHistogram(window, k)
      var ts = 0L
      val arrivals = List.fill(400) { ts += rnd.nextInt(30) + 1; ts }
      arrivals.foreach(eh.add)
      val exact = exactCount(arrivals, ts, window)
      val est = eh.estimate(ts)
      assert(math.abs(est - exact) <= exact.toDouble / k + 1.0)
    }
  }
}
