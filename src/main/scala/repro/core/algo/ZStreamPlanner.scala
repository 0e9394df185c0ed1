package repro.core.algo

import repro.core.Pattern
import repro.core.plan._
import repro.core.stats.Stats

/** One side of a ZStream deciding condition: the cost of combining the two
  * subtrees of a candidate split of range [lo, hi].
  *
  * The subtree *shapes* are frozen at plan-creation time (the DP is never
  * re-run inside `D` — the core of the paper's §4.2 recursion-elimination),
  * but the cost is re-evaluated *live* against current statistics over those
  * frozen shapes.
  *
  * Deviation from the paper, surfaced by our property tests: §4.2 proposes
  * freezing subtree costs/cardinalities as numeric constants, arguing drift
  * inside a subtree is caught by an earlier (leaves-to-root) invariant. That
  * argument has a blind spot: two-leaf subtrees have no alternative splits,
  * hence *empty* DCSs and no earlier invariant, so a rate swap confined to
  * them is invisible to fully-frozen conditions (a guaranteed false
  * negative). Live evaluation over frozen shapes costs O(range²) lookups —
  * constant for a fixed pattern size — and restores the Theorem 1 guarantee:
  * if `cost(chosen shapes) ≥ cost(other shapes)` under current statistics,
  * the DP cannot reproduce the current plan unchanged (it either prefers the
  * other split or improves a subtree — both change the plan).
  */
final case class TreeCostExpr(left: TreeNode, right: TreeNode) extends Serializable {

  /** Sum of inner-node cardinalities of a frozen subtree shape — its cost
    * minus the leaf-rate mass shared by every shape over the same range.
    */
  private def innerCost(node: TreeNode, stats: Stats): Double = node match {
    case LeafNode(_) => 0.0
    case InnerNode(l, r) =>
      innerCost(l, stats) + innerCost(r, stats) +
        CostModel.rangeCardinality(node.lo, node.hi, stats)
  }

  /** Cost of this split *minus the terms common to every split of the same
    * range* (the leaf rates and the root cardinality). Both sides of a
    * deciding condition subtract identical quantities, so the d = 0
    * comparison is unchanged — but the distance-d margin now applies to the
    * genuinely differing part. Comparing full tree costs instead would
    * dilute any relative margin below usefulness: the shared additive mass
    * dominates both sides, so even an extreme rate shift moves their ratio
    * by only a few percent (observed empirically on the traffic regime).
    */
  def eval(stats: Stats): Double = innerCost(left, stats) + innerCost(right, stats)
}

/** Deciding condition of the ZStream planner: for the final plan's node over
  * [lo, hi], the chosen split was cheaper than an alternative split of the
  * same range (`Cost(T₁) < Cost(T₂)`, paper §4.2).
  */
final case class TreeCond(
    chosenExpr: TreeCostExpr,
    otherExpr: TreeCostExpr,
    creationSlack: Double,
) extends InvariantCond {
  def lhs(stats: Stats): Double = chosenExpr.eval(stats)
  def rhs(stats: Stats): Double = otherExpr.eval(stats)

  override def toString: String =
    s"cost(${chosenExpr.left},${chosenExpr.right}) < cost(${otherExpr.left},${otherExpr.right})"
}

/** The ZStream dynamic-programming algorithm for tree-based plan generation
  * (paper Algorithm 3, after Mei & Madden [38]): matrix-chain DP over
  * contiguous position ranges of a SEQ pattern. `Cost(T) = Cost(L) + Cost(R)
  * + Card(T)`; range cardinality is shape-independent.
  *
  * Instrumentation (paper §4.2): each internal node of the *final* tree is a
  * building block; a comparison between the costs of two candidate trees for
  * the node's range is a block-building comparison, so the node's DCS holds
  * `cost(chosen split) < cost(other split)` for every alternative split of
  * its range. Because only one condition per block may be kept (K = 1), the
  * paper recommends the K-invariant method for this algorithm — the DCSs are
  * returned in full, sorted tightest-first, and the decision function trims
  * them to K.
  *
  * Determinism: the split with the strictly lower cost wins; ties break
  * toward the leftmost split point.
  */
final class ZStreamPlanner(val pattern: Pattern) extends Planner {
  def name: String = "zstream"

  def generate(stats: Stats): PlanResult = {
    val n = pattern.n
    // DP state per range [i, j]: best cost, best split, best tree.
    val cost = Array.ofDim[Double](n, n)
    val tree = Array.ofDim[TreeNode](n, n)

    for (i <- 0 until n) {
      cost(i)(i) = stats.rates(i)
      tree(i)(i) = LeafNode(i)
    }
    for (len <- 2 to n; lo <- 0 to n - len) {
      val hi = lo + len - 1
      val card = CostModel.rangeCardinality(lo, hi, stats)
      var bestCost = Double.PositiveInfinity
      var bestTree: TreeNode = null
      var s = lo
      while (s < hi) {
        val c = cost(lo)(s) + cost(s + 1)(hi) + card
        if (c < bestCost) {
          bestCost = c
          bestTree = InnerNode(tree(lo)(s), tree(s + 1)(hi))
        }
        s += 1
      }
      cost(lo)(hi) = bestCost
      tree(lo)(hi) = bestTree
    }

    val root = tree(0)(n - 1)

    def exprFor(lo: Int, s: Int, hi: Int): TreeCostExpr =
      TreeCostExpr(left = tree(lo)(s), right = tree(s + 1)(hi))

    // DCS per internal node of the final plan, leaves-to-root.
    val innerNodes = root.nodesBottomUp.collect { case inn: InnerNode => inn }
    val dcs = innerNodes.map { node =>
      val lo = node.lo; val hi = node.hi
      val chosenSplit = node.left.hi
      val chosen = exprFor(lo, chosenSplit, hi)
      val chosenCost = cost(lo)(chosenSplit) + cost(chosenSplit + 1)(hi) +
        CostModel.rangeCardinality(lo, hi, stats)
      (for (s <- lo until hi if s != chosenSplit) yield {
        val other = exprFor(lo, s, hi)
        val otherCost = cost(lo)(s) + cost(s + 1)(hi) +
          CostModel.rangeCardinality(lo, hi, stats)
        TreeCond(chosen, other, otherCost - chosenCost): InvariantCond
      }).toVector.sortBy(_.creationSlack)
    }
    PlanResult(TreePlan(root), dcs)
  }

  def cost(plan: EvalPlan, stats: Stats): Double = CostModel.planCost(plan, stats)
}
