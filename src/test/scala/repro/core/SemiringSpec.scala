package repro.core

import org.apache.spark.sql.functions._
import repro.SparkSpec

/** Semiring algebra evaluated through Spark columns. */
class SemiringSpec extends SparkSpec {

  import spark.implicits._

  private val vals = Seq(3.0, 1.0, 2.0).toDF("v")

  private def foldOne(s: Semiring) =
    vals.agg(s.plus(col("v"))).collect()(0).get(0)

  test("SumProduct folds with +") { assert(foldOne(Semiring.SumProduct) == 6.0) }
  test("MinSum folds with min") { assert(foldOne(Semiring.MinSum) == 1.0) }
  test("MaxSum folds with max") { assert(foldOne(Semiring.MaxSum) == 3.0) }
  test("MaxProduct folds with max") { assert(foldOne(Semiring.MaxProduct) == 3.0) }

  test("CountProduct folds counts with + and finishes null to 0") {
    val got = Seq(2L, 3L).toDF("v").agg(
      Semiring.CountProduct.finish(Semiring.CountProduct.plus(col("v"))))
      .collect()(0).getLong(0)
    assert(got == 5L)
    val empty = Seq.empty[Long].toDF("v").agg(
      Semiring.CountProduct.finish(Semiring.CountProduct.plus(col("v"))))
      .collect()(0).getLong(0)
    assert(empty == 0L)
  }

  test("times of SumProduct multiplies") {
    val df = Seq((2.0, 3.0)).toDF("a", "b")
    val got = df.select(Semiring.SumProduct.times.get(col("a"), col("b")))
      .collect()(0).getDouble(0)
    assert(got == 6.0)
  }

  test("times of MinSum adds (shifted-identity composition)") {
    val df = Seq((2.0, 3.0)).toDF("a", "b")
    val got = df.select(Semiring.MinSum.times.get(col("a"), col("b")))
      .collect()(0).getDouble(0)
    assert(got == 5.0)
  }

  test("string semirings are single-source (no ⊗)") {
    assert(Semiring.MinString.times.isEmpty)
    assert(Semiring.MaxString.times.isEmpty)
  }

  test("countFold is defined exactly for the sum-like semirings") {
    assert(Semiring.SumProduct.countFold(lit(3L)).isDefined)
    assert(Semiring.CountProduct.countFold(lit(3L)).isDefined)
    assert(Semiring.MinSum.countFold(lit(3L)).isEmpty)
    assert(Semiring.MaxSum.countFold(lit(3L)).isEmpty)
    assert(Semiring.MinString.countFold(lit(3L)).isEmpty)
  }

  test("idempotence flags split sum-like from min/max semirings") {
    assert(!Semiring.SumProduct.idempotent && !Semiring.CountProduct.idempotent)
    assert(Semiring.MinSum.idempotent && Semiring.MaxSum.idempotent &&
      Semiring.MinString.idempotent && Semiring.MaxProduct.idempotent)
  }

  test("identity literals exist where the ablation needs them") {
    assert(Semiring.SumProduct.one.isDefined && Semiring.CountProduct.one.isDefined)
    assert(Semiring.MinString.one.isEmpty)
  }

  test("MinString folds lexicographically") {
    val got = Seq("b", "a", "c").toDF("v")
      .agg(Semiring.MinString.plus(col("v"))).collect()(0).getString(0)
    assert(got == "a")
  }
}
