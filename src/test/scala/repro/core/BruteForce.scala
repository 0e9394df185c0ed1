package repro.core

/** Reference semantics for pattern matching: exhaustive enumeration of all
  * event combinations, used as ground truth for every engine test. A match is
  * one event per pattern position such that the window, the temporal operator
  * (SEQ/AND) and all predicates hold.
  */
object BruteForce {

  def valid(pattern: Pattern, evs: Vector[Event]): Boolean = {
    val ts = evs.map(_.ts)
    if (ts.max - ts.min > pattern.window) return false
    if (pattern.kind == PatternKind.Sequence &&
      !ts.zip(ts.tail).forall { case (a, b) => a < b }) return false
    (0 until pattern.n).forall { i =>
      (i + 1 until pattern.n).forall { j =>
        pattern.pairHolds(i, j, evs(i), evs(j))
      }
    }
  }

  /** All matches as vectors of event ids in pattern-position order. */
  def matches(pattern: Pattern, events: Seq[Event]): Set[Vector[Long]] = {
    val byPos = Vector.tabulate(pattern.n)(p => events.filter(_.etype == pattern.types(p)).toVector)
    def rec(pos: Int, acc: Vector[Event]): Iterator[Vector[Event]] =
      if (pos == pattern.n) Iterator.single(acc)
      else byPos(pos).iterator.flatMap(e => rec(pos + 1, acc :+ e))
    rec(0, Vector.empty).filter(valid(pattern, _)).map(_.map(_.id)).toSet
  }

  /** Deterministic random event stream over types 0..nTypes-1 with ts = index. */
  def randomStream(nTypes: Int, count: Int, seed: Long): Vector[Event] = {
    val rnd = new scala.util.Random(seed)
    Vector.tabulate(count) { i =>
      Event(i.toLong, i.toLong, rnd.nextInt(nTypes), rnd.nextDouble() * 10, rnd.nextDouble() * 10)
    }
  }

  /** Run an engine over a stream and collect the emitted match id-vectors. */
  def runEngine(engine: repro.core.engine.Engine, events: Seq[Event]): Set[Vector[Long]] = {
    val out = scala.collection.mutable.ArrayBuffer.empty[Array[Event]]
    events.foreach(engine.onEvent(_, out))
    out.map(_.map(_.id).toVector).toSet
  }

  /** All contiguous binary tree shapes over positions [lo, hi]. */
  def allTrees(lo: Int, hi: Int): Vector[repro.core.plan.TreeNode] =
    if (lo == hi) Vector(repro.core.plan.LeafNode(lo))
    else (for {
      s <- lo until hi
      l <- allTrees(lo, s)
      r <- allTrees(s + 1, hi)
    } yield repro.core.plan.InnerNode(l, r)).toVector
}
