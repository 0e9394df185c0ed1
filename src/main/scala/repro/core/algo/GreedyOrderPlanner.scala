package repro.core.algo

import repro.core.Pattern
import repro.core.plan.{CostModel, EvalPlan, OrderPlan}
import repro.core.stats.Stats

/** Deciding condition of the greedy order planner: with the already-selected
  * `prefix`, choosing position `chosen` over position `other` required
  * `cost(chosen|prefix) < cost(other|prefix)` where
  * `cost(j|prefix) = r_j · Π_{k∈prefix} sel(k,j)` (paper §4.1). Both sides are
  * re-evaluated against fresh statistics in near-constant time (the product
  * has one factor per predicate between the prefix and the candidate).
  */
final case class GreedyCond(
    prefix: Vector[Int],
    chosen: Int,
    other: Int,
    creationSlack: Double,
) extends InvariantCond {
  def lhs(stats: Stats): Double = CostModel.greedyStepCost(prefix, chosen, stats)
  def rhs(stats: Stats): Double = CostModel.greedyStepCost(prefix, other, stats)
  override def toString: String =
    s"cost($chosen|${prefix.mkString(",")}) < cost($other|${prefix.mkString(",")})"
}

/** The greedy order-based plan generation algorithm (paper Algorithm 2, after
  * Swami [43] as used by the lazy NFA [33]): iteratively append the position
  * minimizing the marginal partial-match rate given the prefix. With no
  * predicates this reduces to ascending-arrival-rate ordering (Example 1).
  *
  * Instrumentation: each selection step is one building block ("process
  * position p at step i"); every comparison of the step winner against
  * another candidate is a block-building comparison whose deciding condition
  * enters the block's DCS (tightest-first).
  *
  * Determinism: ties are broken toward the lower position index, making `A`
  * fully deterministic as Theorems 1–2 require.
  */
final class GreedyOrderPlanner(val pattern: Pattern) extends Planner {
  def name: String = "greedy"

  def generate(stats: Stats): PlanResult = {
    val n = pattern.n
    val remaining = scala.collection.mutable.TreeSet.tabulate(n)(identity)
    val order = Vector.newBuilder[Int]
    var prefix = Vector.empty[Int]
    val dcs = Vector.newBuilder[Vector[InvariantCond]]

    while (remaining.nonEmpty) {
      // Winner: minimal marginal cost, ties toward the lower index.
      var best = -1
      var bestCost = Double.PositiveInfinity
      for (cand <- remaining) {
        val c = CostModel.greedyStepCost(prefix, cand, stats)
        if (c < bestCost) { best = cand; bestCost = c }
      }
      // The block's DCS: winner vs every other candidate still available.
      val conds = (for (other <- remaining.iterator if other != best) yield {
        val slack = CostModel.greedyStepCost(prefix, other, stats) - bestCost
        GreedyCond(prefix, best, other, slack): InvariantCond
      }).toVector.sortBy(_.creationSlack)
      dcs += conds
      order += best
      remaining -= best
      prefix = prefix :+ best
    }
    PlanResult(OrderPlan(order.result()), dcs.result())
  }

  def cost(plan: EvalPlan, stats: Stats): Double = CostModel.planCost(plan, stats)
}
