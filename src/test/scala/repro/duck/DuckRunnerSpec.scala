package repro.duck

import repro.SparkSpec
import repro.core._
import repro.core.Fixtures._
import repro.core.TestData

/** The DuckDB deployment backend (paper §6): typed loading, native
  * execution, and rewritten-script execution agree with the Spark
  * executor.
  */
class DuckRunnerSpec extends SparkSpec {

  private def canonSpark(cq: CQ, inst: CQ.Instances): Set[Vector[String]] = {
    val res = Executor.run(YannakakisPlus.plan(cq), inst)
    val cols = res.df.columns.toVector
    val out = res.df.collect().map(r =>
      cols.indices.map(i => canonCell(r.get(i))).toVector).toSet
    res.cleanup()
    out
  }

  private def canonCell(v: Any): String =
    if (v == null) "null"
    else scala.util.Try(f"${v.toString.toDouble}%.4f").getOrElse(v.toString)

  private def canonDuck(rows: Vector[Vector[String]]): Set[Vector[String]] =
    rows.map(_.map(c => canonCell(c))).toSet

  private def checkBoth(cq: CQ, inst: CQ.Instances): Unit = {
    val d = new DuckRunner
    try {
      d.loadInstances(inst)
      val plan = YannakakisPlus.plan(cq)
      val script = SqlGen.script(plan, SqlGen.DuckDialect)
      script.statements.foreach(d.conn.createStatement().execute)
      val (_, duckRows) = d.fetch(script.finalQuery)
      val (_, nativeRows) = d.fetch(cq.flatSql(duck = false))
      val want = canonSpark(cq, inst)
      assert(canonDuck(duckRows) == want, "duck script vs spark executor")
      assert(canonDuck(nativeRows) == want, "duck native vs spark executor")
    } finally d.close()
  }

  test("Q1 (grouped count): duck native + duck script agree with Spark") {
    checkBoth(q1, TestData.instances(spark, q1, rows = 120, dom = 6))
  }

  test("Q3 (relation-dominated): duck native + duck script agree with Spark") {
    checkBoth(q3, TestData.instances(spark, q3, rows = 120, dom = 6))
  }

  test("sum-product query: duck native + duck script agree with Spark") {
    val cq = CQ("sp", Vector(
      Atom("a", Vector("x", "v")), Atom("b", Vector("x", "w"))),
      Vector("x"),
      Vector(AggSpec("s", Semiring.SumProduct, Map("a" -> "v", "b" -> "w"))))
    checkBoth(cq, TestData.instances(spark, cq, rows = 150, dom = 8))
  }

  test("timings are reported positive") {
    val d = new DuckRunner
    try {
      val inst = TestData.instances(spark, q4, rows = 100, dom = 8)
      d.loadInstances(inst)
      val (n1, t1) = d.runNative(q4)
      val (n2, t2) = d.runScript(YannakakisPlus.plan(q4))
      assert(n1 == n2 && t1 > 0 && t2 > 0)
    } finally d.close()
  }

  test("typed loading preserves Spark schemas") {
    val d = new DuckRunner
    try {
      val df = repro.SynthData.part(spark, 0.001)
      d.load("part", df)
      val (cols, rows) = d.fetch("SELECT * FROM part LIMIT 1")
      assert(cols.map(_.toLowerCase) == df.columns.toVector.map(_.toLowerCase))
      assert(rows.nonEmpty)
      val (_, cnt) = d.fetch("SELECT COUNT(*) AS c FROM part")
      assert(cnt.head.head.toLong == df.count())
    } finally d.close()
  }
}
