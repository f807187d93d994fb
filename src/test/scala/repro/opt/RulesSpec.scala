package repro.opt

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}
import repro.core._
import repro.core.Fixtures._
import repro.core.TestData

/** Cycle elimination (Example 5.2) and dimension fusion (paper §5.1). */
class RulesSpec extends SparkSpec {

  import spark.implicits._

  test("cycle elimination: triangle becomes acyclic with one rename") {
    val r = CycleElimination(triangle)
    assert(r.isDefined)
    assert(Hypergraph.isAcyclic(r.get.cq))
  }

  test("cycle elimination: acyclic queries are left alone") {
    assert(CycleElimination(q1).isEmpty)
  }

  test("cycle elimination preserves triangle counts end-to-end") {
    val e = repro.SynthData.edges(spark, 1500, 60, seed = 19)
    val inst: CQ.Instances = Map(
      "e1" -> e.select($"src".as("a"), $"dst".as("b")),
      "e2" -> e.select($"src".as("b"), $"dst".as("c")),
      "e3" -> e.select($"src".as("c"), $"dst".as("a")))
    val r = CycleElimination(triangle).get
    val plan = YannakakisPlus.plan(r.cq)
    val res = Executor.run(plan, r.rebind(inst))
    val got = r.finish(res.df)
    Oracle.assertEquivalent(got, triangle.oracleSql, inst.toSeq: _*)
    res.cleanup()
  }

  test("cycle elimination on the TPC-H Q5 shape preserves grouped sums") {
    val cq = CQ("q5ish", Vector(
      Atom("c", Vector("ck", "nk")), Atom("o", Vector("ok", "ck")),
      Atom("l", Vector("ok", "sk", "price")), Atom("s", Vector("sk", "nk"))),
      Vector("nk"),
      Vector(AggSpec("rev", Semiring.SumProduct, Map("l" -> "price"))))
    assert(!Hypergraph.isAcyclic(cq))
    val inst: CQ.Instances = Map(
      "c" -> spark.range(50).select(($"id" % 50 + 1).as("ck"), ($"id" % 5).as("nk")),
      "o" -> spark.range(200).select(($"id" + 1).as("ok"), ($"id" % 50 + 1).as("ck")),
      "l" -> spark.range(600).select(($"id" % 200 + 1).as("ok"), ($"id" % 20 + 1).as("sk"),
        floor(rand(3) * 100).cast("double").as("price")),
      "s" -> spark.range(20).select(($"id" + 1).as("sk"), ($"id" % 5).as("nk")))
    val r = CycleElimination(cq).get
    val res = Executor.run(YannakakisPlus.plan(r.cq), r.rebind(inst))
    Oracle.assertEquivalent(r.finish(res.df), cq.oracleSql, inst.toSeq: _*)
    res.cleanup()
  }

  test("cycle elimination keeps distinct-projection semantics") {
    val cq = triangle.copy(output = Vector("a"), aggs = Vector.empty)
    val e = repro.SynthData.edges(spark, 800, 40, seed = 21)
    val inst: CQ.Instances = Map(
      "e1" -> e.select($"src".as("a"), $"dst".as("b")),
      "e2" -> e.select($"src".as("b"), $"dst".as("c")),
      "e3" -> e.select($"src".as("c"), $"dst".as("a")))
    val r = CycleElimination(cq).get
    val res = Executor.run(YannakakisPlus.plan(r.cq), r.rebind(inst))
    Oracle.assertEquivalent(r.finish(res.df), cq.oracleSql, inst.toSeq: _*)
    res.cleanup()
  }

  test("dimension fusion: disjoint small dimensions of a fact are fused") {
    // R1(x1) ⋈ R2(x1,x2) ⋈ R3(x2) — the paper's own example.
    val cq = CQ("dims", Vector(
      Atom("r1", Vector("x1")), Atom("r2", Vector("x1", "x2")),
      Atom("r3", Vector("x2"))), Vector.empty, Fixtures.count())
    val inst: CQ.Instances = Map(
      "r1" -> spark.range(1, 6).toDF("x1"),
      "r2" -> TestData.atomDf(spark, cq.atom("r2"), 500, 8, 3),
      "r3" -> spark.range(1, 7).toDF("x2"))
    val (cq2, inst2, _) = DimensionFusion(cq, inst, maxRows = 100)
    assert(cq2.atoms.size == 2)
    assert(cq2.atoms.exists(_.id == "r1__r3"))
    val res = Executor.run(YannakakisPlus.plan(cq2), inst2)
    Oracle.assertEquivalent(res.df, cq.oracleSql, inst.toSeq: _*)
    res.cleanup()
  }

  test("dimension fusion leaves large relations alone") {
    val cq = CQ("dims2", Vector(
      Atom("r1", Vector("x1")), Atom("r2", Vector("x1", "x2")),
      Atom("r3", Vector("x2"))), Vector.empty, Fixtures.count())
    val inst: CQ.Instances = Map(
      "r1" -> spark.range(1, 500).toDF("x1"),
      "r2" -> TestData.atomDf(spark, cq.atom("r2"), 500, 8, 3),
      "r3" -> spark.range(1, 500).toDF("x2"))
    val (cq2, _, _) = DimensionFusion(cq, inst, maxRows = 100)
    assert(cq2.atoms.size == 3)
  }

  test("dimension fusion merges aggregate sources with the semiring ⊗") {
    val cq = CQ("dims3", Vector(
      Atom("r1", Vector("x1", "v")), Atom("r2", Vector("x1", "x2")),
      Atom("r3", Vector("x2", "w"))), Vector.empty,
      Vector(AggSpec("s", Semiring.SumProduct, Map("r1" -> "v", "r3" -> "w"))))
    val inst: CQ.Instances = Map(
      "r1" -> spark.range(1, 5).select(($"id" % 4 + 1).as("x1"), ($"id" * 2).cast("double").as("v")),
      "r2" -> TestData.atomDf(spark, Atom("r2", Vector("x1", "x2")), 300, 4, 5),
      "r3" -> spark.range(1, 5).select(($"id" % 4 + 1).as("x2"), ($"id" * 3).cast("double").as("w")))
    val (cq2, inst2, _) = DimensionFusion(cq, inst, maxRows = 100)
    assert(cq2.atoms.size == 2)
    val res = Executor.run(YannakakisPlus.plan(cq2), inst2)
    Oracle.assertEquivalent(res.df, cq.oracleSql, inst.toSeq: _*)
    res.cleanup()
  }
}
