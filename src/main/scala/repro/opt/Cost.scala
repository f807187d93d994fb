package repro.opt

import repro.core._

/** Cost model over the Table-1 operator complexities: each operator is
  * charged its inputs plus (for joins/aggregations) its output, weighted
  * by rough per-operator constants. Cardinalities come from a pluggable
  * [[CardEstimator]], so the same model serves the accurate / estimated /
  * worst-case scenarios of paper §7.2.3.
  */
final class CostModel(ce: CardEstimator) {

  /** Cost of one operator (excluding its children's own costs). */
  def opCost(op: Op): Double = op match {
    case s: Scan      => ce.estimate(s)
    case p: Project   =>
      val in = ce.estimate(p.child)
      if (p.dedupe) 1.5 * in + ce.estimate(p) // hash aggregation
      else 0.25 * in                          // column pruning
    case j: Join      =>
      ce.estimate(j.left) + ce.estimate(j.right) + ce.estimate(j)
    case sj: SemiJoin =>
      ce.estimate(sj.left) + ce.estimate(sj.right)
  }

  /** Total cost of the DAG (shared sub-operators charged once). */
  def planCost(plan: Plan): Double = plan.ops.map(opCost).sum
}
