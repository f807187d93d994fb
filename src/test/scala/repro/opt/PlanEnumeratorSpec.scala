package repro.opt

import repro.SparkSpec
import repro.core._
import repro.core.Fixtures._
import repro.core.TestData

/** Cost model and plan enumeration (paper §5.2). */
class PlanEnumeratorSpec extends SparkSpec {

  test("cost model charges joins their inputs plus output") {
    val cq = q4
    val inst = TestData.instances(spark, cq, rows = 200, dom = 10)
    val ce = new ExactCE(cq, inst)
    val cm = new CostModel(ce)
    val j = Join(Plan.scan(cq, "R1"), Plan.scan(cq, "R2"))
    assert(cm.opCost(j) == ce.estimate(j.left) + ce.estimate(j.right) + ce.estimate(j))
  }

  test("plan cost sums operator costs over the deduped DAG") {
    val plan = YannakakisPlus.plan(q4)
    val cm = new CostModel(CardEstimator.Flat)
    assert(cm.planCost(plan) == plan.ops.map(cm.opCost).sum)
  }

  test("best() returns a free-connex tree for a free-connex query") {
    val choice = PlanEnumerator.best(q2)
    assert(JoinTree.isFreeConnex(q2, choice.tree), choice.tree.render())
  }

  test("best() roots relation-dominated queries at the dominating atom") {
    val choice = PlanEnumerator.best(q3)
    assert(choice.tree.atomId == "R1")
  }

  test("best() prefers roots containing output attributes") {
    val choice = PlanEnumerator.best(q1)
    assert((q1.atom(choice.tree.atomId).attrSet & q1.outputSet).nonEmpty)
  }

  test("best() with exact CE never costs more than the default tree's plan") {
    val cq = q1
    val inst = TestData.instances(spark, cq, rows = 120, dom = 6)
    val ce = new ExactCE(cq, inst)
    val cm = new CostModel(ce)
    val choice = PlanEnumerator.best(cq, ce = ce)
    val default = YannakakisPlus.plan(cq, JoinTree.defaultTree(cq))
    assert(choice.cost <= cm.planCost(default) + 1e-9)
  }

  test("best() rejects cyclic queries") {
    intercept[IllegalArgumentException] { PlanEnumerator.best(triangle) }
  }

  test("planning time is recorded and small") {
    val choice = PlanEnumerator.best(q1)
    assert(choice.planningMillis >= 0 && choice.planningMillis < 60000)
    assert(choice.candidates > 0)
  }

  test("Example 5.1: the optimizer's tree beats or ties T1 under exact costs") {
    val inst = TestData.instances(spark, q1, rows = 150, dom = 6)
    val ce = new ExactCE(q1, inst)
    val cm = new CostModel(ce)
    val t1Cost = cm.planCost(YannakakisPlus.plan(q1, q1TreeT1))
    val choice = PlanEnumerator.best(q1, ce = ce)
    assert(choice.cost <= t1Cost + 1e-9)
  }
}
