package repro.core

/** A primitive event in the input stream.
  *
  * @param id    unique event identifier (stream-wide)
  * @param ts    logical timestamp; equals the arrival index, so streams are
  *              in-order with strictly increasing timestamps — the setting the
  *              paper's engines assume (a single multiplexed stream)
  * @param etype event type identifier (the paper's "event type"; one type per
  *              camera / stock id / observation point)
  * @param a0    first numeric attribute (traffic: average speed; stocks: diff)
  * @param a1    second numeric attribute (traffic: vehicle count; stocks: unused)
  */
final case class Event(id: Long, ts: Long, etype: Int, a0: Double, a1: Double)
    extends Serializable {

  /** Attribute access by index, used by [[Predicate]]. */
  def attr(i: Int): Double = if (i == 0) a0 else a1
}
