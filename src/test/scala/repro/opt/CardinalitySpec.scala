package repro.opt

import repro.SparkSpec
import repro.core._
import repro.core.Fixtures._
import repro.core.TestData

/** The three cardinality estimators of §7.2.3: exact counting, classic
  * NDV-based estimates, and worst-case bounds.
  */
class CardinalitySpec extends SparkSpec {

  private lazy val cq = line(3, Vector("x1"), count())
  private lazy val inst = TestData.instances(spark, cq, rows = 400, dom = 20)
  private lazy val stats = Stats.collect(cq, inst)

  test("Stats.collect captures row counts and NDVs") {
    assert(stats("e1").rows == 400.0)
    val ndv = stats("e1").ndv("x1")
    assert(ndv > 10 && ndv < 30) // approx distinct of a 20-value domain
  }

  test("ExactCE matches true operator cardinalities") {
    val ce = new ExactCE(cq, inst)
    val scan = Plan.scan(cq, "e1")
    assert(ce.estimate(scan) == 400.0)
    val j = Join(scan, Plan.scan(cq, "e2"))
    val expected = Executor.materialize(cq, j, inst).count().toDouble
    assert(ce.estimate(j) == expected)
  }

  test("EstimatedCE join estimate is within small factor of truth on uniform data") {
    val ce = new EstimatedCE(cq, stats)
    val j = Join(Plan.scan(cq, "e1"), Plan.scan(cq, "e2"))
    val truth = Executor.materialize(cq, j, inst).count().toDouble
    val est = ce.estimate(j)
    assert(est > truth / 3 && est < truth * 3, s"est=$est truth=$truth")
  }

  test("EstimatedCE semi-join never exceeds the left input") {
    val ce = new EstimatedCE(cq, stats)
    val sj = SemiJoin(Plan.scan(cq, "e1"), Plan.scan(cq, "e2"))
    assert(ce.estimate(sj) <= stats("e1").rows)
  }

  test("EstimatedCE projection bounded by NDV product and input rows") {
    val ce = new EstimatedCE(cq, stats)
    val p = Plan.project(cq, Plan.scan(cq, "e1"), Vector("x1"))
    assert(ce.estimate(p) <= stats("e1").rows)
    assert(ce.estimate(p) <= stats("e1").ndv("x1") + 1)
  }

  test("WorstCaseCE joins are Cartesian without keys") {
    val ce = new WorstCaseCE(cq, stats)
    val j = Join(Plan.scan(cq, "e1"), Plan.scan(cq, "e2"))
    assert(ce.estimate(j) == 400.0 * 400.0)
  }

  test("WorstCaseCE respects declared unique keys") {
    val cfg = RuleConfig.default.copy(uniqueKeys = Map("e2" -> Set(Set("x2"))))
    val ce = new WorstCaseCE(cq, stats, cfg)
    val j = Join(Plan.scan(cq, "e1"), Plan.scan(cq, "e2"))
    assert(ce.estimate(j) == 400.0) // each left row matches ≤ 1 right row
  }

  test("WorstCaseCE dominates the true cardinality") {
    val ce = new WorstCaseCE(cq, stats)
    for (op <- Seq[Op](
      Join(Plan.scan(cq, "e1"), Plan.scan(cq, "e2")),
      SemiJoin(Plan.scan(cq, "e1"), Plan.scan(cq, "e2")),
      Plan.project(cq, Plan.scan(cq, "e1"), Vector("x1")))) {
      val truth = Executor.materialize(cq, op, inst).count().toDouble
      assert(ce.estimate(op) >= truth, s"$op")
    }
  }

  test("deduplicating projection makes the kept attrs a key (worst case)") {
    val cfg = RuleConfig.default
    val ce = new WorstCaseCE(cq, stats, cfg)
    val p = Plan.project(cq, Plan.scan(cq, "e2"), Vector("x2"))
    val j = Join(Plan.scan(cq, "e1"), p)
    assert(ce.estimate(j) == 400.0)
  }
}
