package repro.opt

import repro.core._

/** Cost-based plan enumeration (paper §5.2): generate the valid join
  * trees via GYO-style enumeration, prune with the paper's heuristics,
  * plan each survivor with Yannakakis+, and keep the cheapest.
  *
  * Pruning rules (quoted from §5.2):
  *  - for queries with output attributes, require the root node to
  *    contain output attributes;
  *  - prefer plans where the larger relations are at the top of the tree;
  *  - prioritize bushy plans with lower heights.
  *
  * Additionally, when the query is free-connex the search is restricted
  * to free-connex join trees (that is what preserves the O(N+M) bound),
  * and when it is relation-dominated, to trees rooted at a dominating
  * relation.
  */
object PlanEnumerator {

  final case class Choice(tree: RootedTree, plan: Plan, cost: Double,
                          candidates: Int, planningMillis: Long)

  def best(cq: CQ, cfg: RuleConfig = RuleConfig.default,
           ce: CardEstimator = CardEstimator.Flat,
           stats: Map[String, AtomStats] = Map.empty,
           treeCap: Int = 200, costCap: Int = 48): Choice = {
    val t0 = System.nanoTime()
    val all = JoinTree.enumerateRooted(cq, treeCap)
    require(all.nonEmpty, s"${cq.name}: not acyclic — decompose with GHD first")

    // Structural restriction that protects the theoretical guarantees:
    // free-connex trees when any exist (a tree rooted at a dominating
    // relation is free-connex, so relation-dominated queries are covered).
    val fcTrees = all.filter(JoinTree.isFreeConnex(cq, _))
    val pool = if (fcTrees.nonEmpty) fcTrees else all

    // §5.2 pruning heuristics.
    val rooted =
      if (cq.output.nonEmpty) {
        val withOut = pool.filter(t => (cq.atom(t.atomId).attrSet & cq.outputSet).nonEmpty)
        if (withOut.nonEmpty) withOut else pool
      } else pool
    def rootRows(t: RootedTree): Double =
      stats.get(t.atomId).map(_.rows).getOrElse(0.0)
    val pruned = rooted
      .sortBy(t => (t.height, -rootRows(t), t.render()))
      .take(costCap)

    val cm = new CostModel(ce)
    val scored = pruned.map { t =>
      val p = YannakakisPlus.plan(cq, t, cfg, ce)
      (t, p, cm.planCost(p))
    }
    val (tree, plan, cost) = scored.minBy(_._3)
    Choice(tree, plan, cost, pruned.size,
      (System.nanoTime() - t0) / 1000000)
  }
}
