package repro.core.engine

import repro.core.{Event, Pattern, PatternKind}
import repro.core.plan.OrderPlan
import scala.collection.mutable

/** Order-based (lazy NFA) evaluation engine, after Kolchinsky et al. [33].
  *
  * The plan order is a processing order, not the temporal order: events of
  * `order(0)`'s position open partial matches; a partial match at step `s`
  * is extended with events of position `order(s)` either from the history
  * buffer (events that already arrived) or, failing that, by waiting in
  * `pending(s)` for future arrivals. Each valid event combination is
  * therefore produced exactly once.
  *
  * SEQ temporal order, the time window, and all applicable predicates are
  * enforced on every extension; expired history and dead partial matches are
  * pruned by watermark.
  */
final class OrderEngine(val pattern: Pattern, val plan: OrderPlan, pruneEvery: Int = 128)
    extends Engine {
  require(plan.order.size == pattern.n)

  private val n = pattern.n
  private val isSeq = pattern.kind == PatternKind.Sequence
  // stepOf(pos) = index of `pos` in the plan order.
  private val stepOf: Array[Int] = {
    val a = new Array[Int](n)
    plan.order.zipWithIndex.foreach { case (p, s) => a(p) = s }
    a
  }

  private val buffers = Array.fill(n)(new mutable.ArrayDeque[Event]) // per position, ts order
  private val pending = Array.fill(n)(new mutable.ArrayBuffer[PartialMatch]) // per step s >= 1
  private var pmCount = 0L
  private var sincePrune = 0

  def partialMatchesCreated: Long = pmCount

  /** Can `e` at position `pos` legally extend `pm`? */
  private def compatible(pm: PartialMatch, e: Event, pos: Int): Boolean = {
    if (math.max(pm.maxTs, e.ts) - math.min(pm.minTs, e.ts) > pattern.window) return false
    if (isSeq) {
      var q = 0
      while (q < n) {
        val other = pm.events(q)
        if (other != null) {
          if (q < pos) { if (other.ts >= e.ts) return false }
          else if (other.ts <= e.ts) return false
        }
        q += 1
      }
    }
    val touching = pattern.predsTouching(pos)
    var t = 0
    while (t < touching.length) {
      val (otherPos, pr) = touching(t)
      val other = pm.events(otherPos)
      if (other != null) {
        val (a, b) = if (pr.i == pos) (e, other) else (other, e)
        if (!pr.eval(a, b)) return false
      }
      t += 1
    }
    true
  }

  /** Advance `pm` (which has completed steps `0 until step`): scan history
    * for the next position's events, then park in `pending(step)` to catch
    * future arrivals.
    */
  private def advance(pm: PartialMatch, step: Int, out: mutable.Buffer[Array[Event]]): Unit = {
    if (step == n) { out += pm.events; return }
    val nextPos = plan.order(step)
    val buf = buffers(nextPos)
    var i = 0
    while (i < buf.length) {
      val cand = buf(i)
      if (compatible(pm, cand, nextPos)) {
        pmCount += 1
        advance(pm.extended(cand, nextPos), step + 1, out)
      }
      i += 1
    }
    pending(step) += pm
  }

  def onEvent(e: Event, out: mutable.Buffer[Array[Event]]): Unit = {
    val posOpt = pattern.typeToPos.get(e.etype)
    if (posOpt.isEmpty) return
    val pos = posOpt.get

    sincePrune += 1
    if (sincePrune >= pruneEvery) { prune(e.ts); sincePrune = 0 }

    val step = stepOf(pos)
    // Future-arrival path: extend parked partial matches awaiting this step.
    if (step > 0) {
      val parked = pending(step)
      // Iterate over a snapshot length: `advance` only appends to other steps.
      var i = 0
      val len = parked.length
      while (i < len) {
        val pm = parked(i)
        if (compatible(pm, e, pos)) {
          pmCount += 1
          advance(pm.extended(e, pos), step + 1, out)
        }
        i += 1
      }
    } else {
      // Opening position: every event starts a new partial match.
      pmCount += 1
      advance(PartialMatch.single(n, e, pos), 1, out)
    }
    buffers(pos).append(e)
  }

  /** Drop expired history and partial matches that can no longer complete:
    * any completion uses either buffered events (handled at creation) or
    * future events with ts ≥ now, so `minTs < now − window` is dead.
    */
  private def prune(now: Long): Unit = {
    val horizon = now - pattern.window
    var p = 0
    while (p < n) {
      val buf = buffers(p)
      while (buf.nonEmpty && buf.head.ts < horizon) buf.removeHead()
      p += 1
    }
    var s = 1
    while (s < n) {
      pending(s).filterInPlace(_.minTs >= horizon)
      s += 1
    }
  }
}
