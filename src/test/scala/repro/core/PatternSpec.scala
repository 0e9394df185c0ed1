package repro.core

import org.scalatest.funsuite.AnyFunSuite

class PatternSpec extends AnyFunSuite {

  private def ev(id: Long, t: Int, a0: Double, a1: Double = 0.0) = Event(id, id, t, a0, a1)

  test("seq factory builds positions with identity types") {
    val p = Pattern.seq(4, 100)
    assert(p.n == 4 && p.types == Vector(0, 1, 2, 3))
    assert(p.kind == PatternKind.Sequence)
  }

  test("conj factory builds a conjunction pattern") {
    val p = Pattern.conj(3, 50)
    assert(p.kind == PatternKind.Conjunction && p.n == 3)
  }

  test("duplicate types rejected") {
    intercept[IllegalArgumentException] {
      Pattern(PatternKind.Sequence, Vector(1, 1, 2), Vector.empty, 10)
    }
  }

  test("non-positive window rejected") {
    intercept[IllegalArgumentException] { Pattern.seq(2, 0) }
  }

  test("predicate referencing missing position rejected") {
    intercept[IllegalArgumentException] {
      Pattern.seq(2, 10, Vector(Predicate(0, 5, 0, PredOp.Lt)))
    }
  }

  test("self-predicate rejected") {
    intercept[IllegalArgumentException] { Predicate(1, 1, 0, PredOp.Lt) }
  }

  test("typeToPos maps types to positions") {
    val p = Pattern(PatternKind.Sequence, Vector(7, 3, 9), Vector.empty, 10)
    assert(p.typeToPos == Map(7 -> 0, 3 -> 1, 9 -> 2))
  }

  test("predicate evaluation respects operator and attribute index") {
    val lt = Predicate(0, 1, 0, PredOp.Lt)
    val gt = Predicate(0, 1, 1, PredOp.Gt)
    assert(lt.eval(ev(0, 0, 1.0), ev(1, 1, 2.0)))
    assert(!lt.eval(ev(0, 0, 3.0), ev(1, 1, 2.0)))
    assert(gt.eval(ev(0, 0, 0, 5.0), ev(1, 1, 0, 4.0)))
    assert(!gt.eval(ev(0, 0, 0, 3.0), ev(1, 1, 0, 4.0)))
  }

  test("pairHolds orients predicates regardless of argument order") {
    val p = Pattern.seq(2, 10, Vector(Predicate(0, 1, 0, PredOp.Lt)))
    val e0 = ev(0, 0, 1.0); val e1 = ev(1, 1, 2.0)
    assert(p.pairHolds(0, 1, e0, e1))   // e0 at pos 0
    assert(p.pairHolds(1, 0, e1, e0))   // same pair, swapped call order
    assert(!p.pairHolds(0, 1, e1.copy(a0 = 9.0), e1)) // 9 < 2 fails
  }

  test("pairHolds is true for pairs without predicates") {
    val p = Pattern.seq(3, 10, Vector(Predicate(0, 1, 0, PredOp.Lt)))
    assert(p.pairHolds(0, 2, ev(0, 0, 9.0), ev(2, 2, 1.0)))
  }

  test("pairHolds evaluates the conjunction of all pair predicates") {
    val p = Pattern.seq(2, 10, Vector(
      Predicate(0, 1, 0, PredOp.Lt), Predicate(0, 1, 1, PredOp.Gt)))
    assert(p.pairHolds(0, 1, ev(0, 0, 1.0, 5.0), ev(1, 1, 2.0, 4.0)))
    assert(!p.pairHolds(0, 1, ev(0, 0, 1.0, 3.0), ev(1, 1, 2.0, 4.0))) // a1 fails
    assert(!p.pairHolds(0, 1, ev(0, 0, 3.0, 5.0), ev(1, 1, 2.0, 4.0))) // a0 fails
  }

  test("predsTouching lists predicates for both endpoints") {
    val pr = Predicate(0, 2, 0, PredOp.Lt)
    val p = Pattern.seq(3, 10, Vector(pr))
    assert(p.predsTouching(0) == Vector((2, pr)))
    assert(p.predsTouching(2) == Vector((0, pr)))
    assert(p.predsTouching(1).isEmpty)
  }

  test("predicatePairs normalized and sorted") {
    val p = Pattern.seq(4, 10, Vector(
      Predicate(2, 1, 0, PredOp.Lt), Predicate(0, 3, 0, PredOp.Gt)))
    assert(p.predicatePairs == Vector((0, 3), (1, 2)))
  }

  test("event attr accessor") {
    val e = ev(0, 0, 1.5, 2.5)
    assert(e.attr(0) == 1.5 && e.attr(1) == 2.5)
  }
}
