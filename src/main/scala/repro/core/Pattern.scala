package repro.core

/** Operator applied over the pattern's primitive events. The paper's basic
  * plan-generation algorithms (its §4) target sequence and conjunction;
  * negation/Kleene closure are layered via pattern transformations outside the
  * planner and are orthogonal to the invariant method (paper §4.1).
  */
sealed trait PatternKind extends Serializable
object PatternKind {
  /** SEQ: event timestamps must be ordered by pattern position. */
  case object Sequence extends PatternKind
  /** AND: any temporal order inside the window. */
  case object Conjunction extends PatternKind
}

/** Comparison operator of a [[Predicate]]. */
sealed trait PredOp extends Serializable
object PredOp {
  case object Lt extends PredOp
  case object Gt extends PredOp
}

/** Binary inter-event predicate between two pattern positions:
  * `event_at(i).attr <op> event_at(j).attr`. Several predicates may be defined
  * on one pair of positions; their conjunction carries the pair's selectivity
  * `sel_{i,j}` of the paper.
  */
final case class Predicate(i: Int, j: Int, attr: Int, op: PredOp) extends Serializable {
  require(i != j, s"predicate must relate two distinct positions, got ($i,$j)")

  /** Evaluate with `ei` the event at position `i` and `ej` at position `j`. */
  def eval(ei: Event, ej: Event): Boolean = op match {
    case PredOp.Lt => ei.attr(attr) < ej.attr(attr)
    case PredOp.Gt => ei.attr(attr) > ej.attr(attr)
  }
}

/** A CEP pattern: operator kind, the event type expected at each position,
  * the inter-event predicates, and the time window (in timestamp ticks).
  *
  * Positions are 0-based; `types(p)` is the event type accepted at position
  * `p`. Types must be distinct (one stream per type, as in the paper's
  * examples and both evaluation datasets).
  */
final case class Pattern(
    kind: PatternKind,
    types: Vector[Int],
    predicates: Vector[Predicate],
    window: Long,
) extends Serializable {
  require(types.distinct.size == types.size, "pattern positions must use distinct event types")
  require(window > 0, "window must be positive")
  predicates.foreach { p =>
    require(p.i >= 0 && p.i < types.size && p.j >= 0 && p.j < types.size,
      s"predicate $p references positions outside 0..${types.size - 1}")
  }

  /** Number of primitive events in the pattern (the paper's pattern size n). */
  val n: Int = types.size

  /** Map from event type to its pattern position; events of other types are
    * ignored by the engines.
    */
  val typeToPos: Map[Int, Int] = types.zipWithIndex.toMap

  /** Predicates grouped by the unordered position pair they relate, keyed with
    * the smaller position first.
    */
  val predsByPair: Map[(Int, Int), Vector[Predicate]] =
    predicates.groupBy(p => (math.min(p.i, p.j), math.max(p.i, p.j)))

  /** All unordered position pairs that carry at least one predicate. */
  val predicatePairs: Vector[(Int, Int)] = predsByPair.keys.toVector.sorted

  /** Predicates touching a given position, paired with the other position. */
  val predsTouching: Vector[Vector[(Int, Predicate)]] =
    Vector.tabulate(n) { p =>
      predicates.collect {
        case pr if pr.i == p => (pr.j, pr)
        case pr if pr.j == p => (pr.i, pr)
      }
    }

  /** Joint predicate evaluation for the unordered pair (i,j); `true` when no
    * predicate is defined on the pair.
    */
  def pairHolds(i: Int, j: Int, ei: Event, ej: Event): Boolean = {
    val key = (math.min(i, j), math.max(i, j))
    predsByPair.get(key) match {
      case None        => true
      case Some(preds) =>
        // Orient each predicate: its `i` side is the event at position pred.i.
        preds.forall { pr =>
          val (a, b) = if (pr.i == i) (ei, ej) else (ej, ei)
          pr.eval(a, b)
        }
    }
  }
}

object Pattern {
  /** A SEQ pattern over positions 0..n-1 with types 0..n-1 and the given
    * adjacent-pair predicates — the shape used by both evaluation datasets.
    */
  def seq(n: Int, window: Long, predicates: Vector[Predicate] = Vector.empty): Pattern =
    Pattern(PatternKind.Sequence, Vector.tabulate(n)(identity), predicates, window)

  /** An AND pattern over types 0..n-1. */
  def conj(n: Int, window: Long, predicates: Vector[Predicate] = Vector.empty): Pattern =
    Pattern(PatternKind.Conjunction, Vector.tabulate(n)(identity), predicates, window)
}
