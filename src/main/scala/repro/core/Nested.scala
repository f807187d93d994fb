package repro.core

import org.apache.spark.sql.DataFrame

/** Staged evaluation of nested queries (paper §4.2): the inner
  * conjunctive query is evaluated first (with Yannakakis+), its result
  * becomes a new input relation of the outer query, and the outer query
  * is evaluated in a second stage — the TPC-H Q17 pattern of Example 4.2.
  */
object Nested {

  /** Evaluate `inner`, expose its result under `atomId` in the outer
    * instance map (columns must already match the outer atom's attrs
    * after `adapt`).
    */
  def stage(inner: CQ, innerInst: CQ.Instances,
            outerInst: CQ.Instances, atomId: String,
            adapt: DataFrame => DataFrame = identity): CQ.Instances = {
    val plan = YannakakisPlus.plan(inner)
    val res = Executor.run(plan, innerInst)
    outerInst + (atomId -> adapt(res.df))
  }
}
