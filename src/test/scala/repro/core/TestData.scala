package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types.LongType

/** Random instances for arbitrary CQ shapes: every attribute drawn
  * uniformly from a small domain (so joins actually match), one DataFrame
  * per atom. Deterministic in the seed.
  */
object TestData {

  def instances(spark: SparkSession, cq: CQ, rows: Int = 200, dom: Int = 10,
                seed: Long = 7): CQ.Instances =
    cq.atoms.zipWithIndex.map { case (a, i) =>
      a.id -> atomDf(spark, a, rows, dom, seed + 31 * i)
    }.toMap

  def atomDf(spark: SparkSession, a: Atom, rows: Int, dom: Int, seed: Long): DataFrame =
    spark.range(rows).select(a.attrs.zipWithIndex.map { case (x, j) =>
      (rand(seed + j) * dom + 1).cast(LongType).as(x)
    }: _*)

  /** Instances where one atom is empty — dangling-tuple edge cases. */
  def withEmpty(spark: SparkSession, cq: CQ, emptyAtom: String,
                rows: Int = 200, dom: Int = 10, seed: Long = 7): CQ.Instances =
    instances(spark, cq, rows, dom, seed).map { case (id, df) =>
      id -> (if (id == emptyAtom) df.limit(0) else df)
    }
}
