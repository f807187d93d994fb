package repro.ghd

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}
import repro.core._
import repro.core.Fixtures._

/** GHD decomposition and bag materialization for cyclic queries
  * (paper §4.1, Example 4.1).
  */
class GHDSpec extends SparkSpec {

  import spark.implicits._

  test("triangle decomposes into a single bag") {
    val decs = GHD.decompositions(triangle)
    assert(decs.nonEmpty)
    assert(decs.exists(_.bags.size == 1))
  }

  test("Example 4.1: the dumbbell admits the two-triangles-plus-bridge decomposition") {
    val decs = GHD.decompositions(dumbbell)
    val want = decs.find { d =>
      d.bags.map(_.memberIds.toSet).toSet ==
        Set(Set("r1", "r2", "r3"), Set("r4"), Set("r5", "r6", "r7"))
    }
    assert(want.isDefined, decs.map(_.bags.map(_.memberIds)).mkString("\n"))
  }

  test("every decomposition's bag hypergraph is acyclic") {
    for (d <- GHD.decompositions(dumbbell))
      assert(Hypergraph.isAcyclic(GHD.structuralCQ(dumbbell, d)))
  }

  test("acyclic queries trivially decompose into singleton bags") {
    val decs = GHD.decompositions(q1)
    assert(decs.exists(_.bags.forall(_.memberIds.size == 1)))
  }

  test("bestDecomposition picks a valid decomposition for the 5-cycle") {
    val cq = CQ("c5", (1 to 5).map(i =>
      Atom(s"e$i", Vector(s"x$i", s"x${i % 5 + 1}"))).toVector,
      Vector.empty, Fixtures.count())
    val stats = cq.atoms.map(a => a.id -> repro.opt.AtomStats(100, Map())).toMap
    val dec = GHD.bestDecomposition(cq, stats)
    assert(dec.isDefined)
    assert(Hypergraph.isAcyclic(GHD.structuralCQ(cq, dec.get)))
  }

  test("triangle count via GHD matches the oracle") {
    val e = repro.SynthData.edges(spark, 1200, 50, seed = 29)
    val inst: CQ.Instances = Map(
      "e1" -> e.select($"src".as("a"), $"dst".as("b")),
      "e2" -> e.select($"src".as("b"), $"dst".as("c")),
      "e3" -> e.select($"src".as("c"), $"dst".as("a")))
    val stats = repro.opt.Stats.collect(triangle, inst)
    val dec = GHD.bestDecomposition(triangle, stats).get
    val (cq2, inst2) = GHD.materialize(triangle, inst, dec)
    val res = Executor.run(YannakakisPlus.plan(cq2), inst2)
    Oracle.assertEquivalent(res.df, triangle.oracleSql, inst.toSeq: _*)
    res.cleanup()
  }

  test("dumbbell count via GHD matches the oracle") {
    val e = repro.SynthData.edges(spark, 400, 25, seed = 31)
    def seg(a: String, b: String) = e.select($"src".as(a), $"dst".as(b))
    val inst: CQ.Instances = Map(
      "r1" -> seg("x1", "x2"), "r2" -> seg("x2", "x3"), "r3" -> seg("x3", "x1"),
      "r4" -> seg("x3", "x4"), "r5" -> seg("x4", "x5"), "r6" -> seg("x5", "x6"),
      "r7" -> seg("x6", "x4"))
    val stats = repro.opt.Stats.collect(dumbbell, inst)
    val dec = GHD.bestDecomposition(dumbbell, stats).get
    val (cq2, inst2) = GHD.materialize(dumbbell, inst, dec)
    val res = Executor.run(YannakakisPlus.plan(cq2), inst2)
    Oracle.assertEquivalent(res.df, dumbbell.oracleSql, inst.toSeq: _*)
    res.cleanup()
  }

  test("aggregate sources in the same bag are ⊗-combined") {
    val cq = CQ("tsum", Vector(
      Atom("e1", Vector("a", "b", "v")), Atom("e2", Vector("b", "c")),
      Atom("e3", Vector("c", "a"))), Vector.empty,
      Vector(AggSpec("s", Semiring.SumProduct, Map("e1" -> "v"))))
    val e = repro.SynthData.edges(spark, 600, 30, seed = 37)
    val inst: CQ.Instances = Map(
      "e1" -> e.select($"src".as("a"), $"dst".as("b"),
        floor(rand(5) * 9 + 1).cast("double").as("v")),
      "e2" -> e.select($"src".as("b"), $"dst".as("c")),
      "e3" -> e.select($"src".as("c"), $"dst".as("a")))
    val stats = repro.opt.Stats.collect(cq, inst)
    val dec = GHD.bestDecomposition(cq, stats).get
    val (cq2, inst2) = GHD.materialize(cq, inst, dec)
    val res = Executor.run(YannakakisPlus.plan(cq2), inst2)
    Oracle.assertEquivalent(res.df, cq.oracleSql, inst.toSeq: _*)
    res.cleanup()
  }

  test("generalized free-connex classification (Table 6 q2a/q2b)") {
    // full-output and empty-output dumbbells are generalized free-connex
    val full = dumbbell.copy(output = (1 to 6).map(i => s"x$i").toVector,
      aggs = Vector.empty, distinctOutput = false)
    assert(GHD.isGeneralizedFreeConnex(full))
    assert(GHD.isGeneralizedFreeConnex(dumbbell)) // O = ∅
    // …but a triangle with two output corners is not obviously so under
    // single-bag decompositions — it still is (bag contains all attrs):
    assert(GHD.isGeneralizedFreeConnex(triangle.copy(output = Vector("a", "b"),
      aggs = Fixtures.count())))
  }
}
