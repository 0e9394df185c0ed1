package repro.core.engine

import repro.core.Event
import scala.collection.mutable

/** A partial match: events indexed by pattern position (`null` = unfilled),
  * plus cached min/max timestamps for O(1) window checks.
  */
final class PartialMatch(
    val events: Array[Event],
    val filled: Int,
    val minTs: Long,
    val maxTs: Long,
) extends Serializable {

  /** New partial match extended with `e` at position `pos`. */
  def extended(e: Event, pos: Int): PartialMatch = {
    val arr = events.clone()
    arr(pos) = e
    new PartialMatch(arr, filled + 1, math.min(minTs, e.ts), math.max(maxTs, e.ts))
  }
}

object PartialMatch {
  def single(n: Int, e: Event, pos: Int): PartialMatch = {
    val arr = new Array[Event](n)
    arr(pos) = e
    new PartialMatch(arr, 1, e.ts, e.ts)
  }
}

/** A pattern evaluation engine instantiated from an evaluation plan. Events
  * must be fed in timestamp order; full matches (events by pattern position)
  * are appended to `out`.
  */
trait Engine extends Serializable {

  def onEvent(e: Event, out: mutable.Buffer[Array[Event]]): Unit

  /** Total partial matches materialized — the quantity the cost model
    * predicts and the plans minimize.
    */
  def partialMatchesCreated: Long
}
