package repro.opt

import repro.core._

/** Per-atom base statistics: row count and per-attribute NDVs — the
  * "basic statistical information from the base tables" of paper §5.2.
  */
final case class AtomStats(rows: Double, ndv: Map[String, Double])

object Stats {
  /** Collect exact base statistics (cheap at bench scale; a real system
    * would use sketches — the estimates downstream are inexact anyway).
    */
  def collect(cq: CQ, instances: CQ.Instances): Map[String, AtomStats] = {
    import org.apache.spark.sql.functions._
    cq.atoms.map { a =>
      val df = instances(a.id)
      val aggs = count(lit(1)).as("__rows") +:
        a.attrs.map(x => approx_count_distinct(x).as(s"__ndv_$x"))
      val row = df.agg(aggs.head, aggs.tail: _*).collect()(0)
      val rows = row.getAs[Long]("__rows").toDouble
      val ndv = a.attrs.map(x =>
        x -> math.max(1.0, row.getAs[Long](s"__ndv_$x").toDouble)).toMap
      a.id -> AtomStats(math.max(rows, 1.0), ndv)
    }.toMap
  }
}

/** Estimated cardinalities under the classic uniformity/independence
  * assumptions (paper §7.2.3 "Estimated Cardinality"): join selectivity
  * `1 / max(ndv_l, ndv_r)` per join attribute, semi-join selectivity
  * `min(1, ndv_r / ndv_l)`, projection size bounded by the NDV product.
  */
final class EstimatedCE(cq: CQ, stats: Map[String, AtomStats]) extends CardEstimator {

  final case class Est(rows: Double, ndv: Map[String, Double])

  private val memo = collection.mutable.Map.empty[Op, Est]

  def est(op: Op): Est = memo.getOrElseUpdate(op, op match {
    case s: Scan =>
      val st = stats(s.atomId)
      Est(st.rows, st.ndv)
    case p: Project =>
      val c = est(p.child)
      if (!p.dedupe) Est(c.rows, c.ndv.view.filterKeys(p.keep.toSet).toMap)
      else {
        val ndvKeep = p.keep.map(x => c.ndv.getOrElse(x, c.rows))
        val bound = ndvKeep.foldLeft(1.0)((a, b) => math.min(a * b, 1e18))
        Est(math.min(c.rows, bound), c.ndv.view.filterKeys(p.keep.toSet).toMap)
      }
    case j: Join =>
      val l = est(j.left); val r = est(j.right)
      val common = j.left.attrSet & j.right.attrSet
      val sel = common.foldLeft(1.0) { (acc, x) =>
        acc / math.max(1.0, math.max(l.ndv.getOrElse(x, l.rows), r.ndv.getOrElse(x, r.rows)))
      }
      val rows = math.max(1.0, l.rows * r.rows * sel)
      val ndv = (l.ndv.keySet ++ r.ndv.keySet).map { x =>
        val n = math.min(l.ndv.getOrElse(x, Double.MaxValue),
          r.ndv.getOrElse(x, Double.MaxValue))
        x -> math.min(n, rows)
      }.toMap
      Est(rows, ndv)
    case sj: SemiJoin =>
      val l = est(sj.left); val r = est(sj.right)
      val common = sj.left.attrSet & sj.right.attrSet
      val sel = common.foldLeft(1.0) { (acc, x) =>
        val nl = l.ndv.getOrElse(x, l.rows)
        val nr = r.ndv.getOrElse(x, r.rows)
        acc * math.min(1.0, nr / math.max(nl, 1.0))
      }
      val rows = math.max(1.0, l.rows * sel)
      Est(rows, l.ndv.view.mapValues(n => math.min(n, rows)).toMap)
  })

  def estimate(op: Op): Double = est(op).rows
}

/** Worst-case bounds (paper §7.2.3 "Worst-Case Bounds"): joins are
  * Cartesian products unless the join attributes cover a declared unique
  * key; projections and semi-joins never shrink anything.
  */
final class WorstCaseCE(cq: CQ, stats: Map[String, AtomStats],
                        cfg: RuleConfig = RuleConfig.default) extends CardEstimator {

  private val memo = collection.mutable.Map.empty[Op, (Double, Set[Set[String]])]

  /** (bound, known unique keys). */
  private def est(op: Op): (Double, Set[Set[String]]) = memo.getOrElseUpdate(op, op match {
    case s: Scan    => (stats(s.atomId).rows, cfg.keysOf(s.atomId))
    case p: Project =>
      val (r, k) = est(p.child)
      (r, PlannerUtil.keysAfterProject(k, p.keep.toSet, p.dedupe))
    case j: Join =>
      val (lr, lk) = est(j.left); val (rr, rk) = est(j.right)
      val common = j.left.attrSet & j.right.attrSet
      val lBound = if (rk.exists(_.subsetOf(common))) lr else lr * rr
      val rBound = if (lk.exists(_.subsetOf(common))) rr else lr * rr
      (math.min(math.min(lBound, rBound), 1e18),
        PlannerUtil.keysAfterJoin(j.left.attrSet, lk, j.right.attrSet, rk))
    case sj: SemiJoin =>
      val (lr, lk) = est(sj.left)
      (lr, lk)
  })

  def estimate(op: Op): Double = est(op)._1
}

/** Exact cardinalities — executes each sub-operator once and counts
  * (paper §7.2.3 "Accurate Cardinality"). Memoized; meant for the Table 4
  * scenario study, not production planning.
  */
final class ExactCE(cq: CQ, instances: CQ.Instances) extends CardEstimator {
  private val memo = collection.mutable.Map.empty[Op, Double]

  def estimate(op: Op): Double = memo.getOrElseUpdate(op,
    Executor.materialize(cq, op, instances).count().toDouble)
}
