package repro.workloads

import org.apache.spark.sql.DataFrame
import repro.core._
import repro.ghd.GHD
import repro.opt._

/** Evaluates a [[Workload]] with one of the competing methods — the three
  * rows of the paper's benchmark tables:
  *
  *  - [[Runner.Native]]          — the engine's own plan (flat SQL through
  *                                 Catalyst);
  *  - [[Runner.Classic]]         — the vanilla Yannakakis algorithm;
  *  - [[Runner.Plus]]            — Yannakakis+ with the rule- and
  *                                 cost-based optimizer;
  *  - [[Runner.PlusSql]]         — Yannakakis+ deployed as rewritten SQL
  *                                 statements (the paper's §6 architecture)
  *                                 executed through `spark.sql`.
  *
  * Cyclic queries: Native runs the flat SQL as-is; the Yannakakis methods
  * first acyclify — by the §5.1 cycle-elimination rule when key facts are
  * declared (the TPC-H Q5 pattern), otherwise by GHD (§4.1).
  */
object Runner {

  sealed trait Method { def label: String }
  case object Native extends Method { val label = "native" }
  case object Classic extends Method { val label = "yannakakis" }
  case object Plus extends Method { val label = "yannakakis+" }
  case object PlusSql extends Method { val label = "yannakakis+(sql)" }

  sealed trait CeMode
  case object CeEstimated extends CeMode
  case object CeAccurate extends CeMode
  case object CeWorstCase extends CeMode
  case object CeFlat extends CeMode

  final case class RunResult(df: DataFrame, plan: Option[Plan],
                             cleanups: Vector[() => Unit]) {
    def cleanup(): Unit = cleanups.foreach(_.apply())
  }

  def run(w: Workload, method: Method, ceMode: CeMode = CeEstimated,
          optimize: Boolean = true): RunResult = method match {
    case Native =>
      RunResult(Executor.runNative(w.cq, w.instances), None, Vector.empty)
    case Classic =>
      val (cq, inst, _, fin) = acyclify(w)
      val plan = Yannakakis.plan(cq, JoinTree.defaultTree(cq))
      val res = Executor.run(plan, inst)
      RunResult(fin(res.df), Some(plan), Vector(() => res.cleanup()))
    case Plus =>
      val (cq, inst, cfg, fin) = acyclify(w)
      val plan = planPlus(cq, inst, cfg, ceMode, optimize)
      val res = Executor.run(plan, inst)
      RunResult(fin(res.df), Some(plan), Vector(() => res.cleanup()))
    case PlusSql =>
      val (cq, inst, cfg, fin) = acyclify(w)
      val plan = planPlus(cq, inst, cfg, ceMode, optimize)
      inst.foreach { case (id, df) => df.createOrReplaceTempView(id) }
      val spark = inst.head._2.sparkSession
      val script = SqlGen.script(plan, SqlGen.SparkDialect)
      script.statements.foreach(spark.sql)
      RunResult(fin(spark.sql(script.finalQuery)), Some(plan), Vector.empty)
  }

  // Statistics caches — a DBMS keeps table statistics up front (the
  // paper's optimizer reads them from the engine), so repeated runs over
  // the same bound instances must not recollect them. Keyed by the
  // identity of the instance map.
  private val statsCache =
    collection.concurrent.TrieMap.empty[Int, Map[String, AtomStats]]
  private val exactCache = collection.concurrent.TrieMap.empty[Int, ExactCE]

  def cachedStats(cq: CQ, inst: CQ.Instances): Map[String, AtomStats] =
    statsCache.getOrElseUpdate(System.identityHashCode(inst), Stats.collect(cq, inst))

  /** Choose a Yannakakis+ plan: cost-based over the enumerated join trees
    * when `optimize`, else the deterministic default tree.
    */
  def planPlus(cq: CQ, inst: CQ.Instances, cfg: RuleConfig,
               ceMode: CeMode, optimize: Boolean): Plan = {
    if (!optimize)
      return YannakakisPlus.plan(cq, JoinTree.defaultTree(cq), cfg)
    val stats = cachedStats(cq, inst)
    val ce: CardEstimator = ceMode match {
      case CeEstimated => new EstimatedCE(cq, stats)
      case CeAccurate  =>
        exactCache.getOrElseUpdate(System.identityHashCode(inst), new ExactCE(cq, inst))
      case CeWorstCase => new WorstCaseCE(cq, stats, cfg)
      case CeFlat      => CardEstimator.Flat
    }
    // exact counting is expensive — keep its candidate pool small
    val costCap = if (ceMode == CeAccurate) 8 else 48
    PlanEnumerator.best(cq, cfg, ce, stats, costCap = costCap).plan
  }

  /** Make the query acyclic if it is not: cycle elimination when key
    * facts exist (paper §5.1), GHD otherwise (§4.1). Returns the working
    * (cq, instances, cfg) and a finishing step for the result.
    */
  def acyclify(w: Workload): (CQ, CQ.Instances, RuleConfig, DataFrame => DataFrame) = {
    if (Hypergraph.isAcyclic(w.cq))
      return (w.cq, w.instances, w.cfg, identity)
    if (w.cfg.uniqueKeys.nonEmpty) {
      CycleElimination(w.cq) match {
        case Some(r) =>
          val (atomId, from, _) = r.renamed
          // Key/integrity facts on the renamed attribute are dropped.
          val cfg2 = w.cfg.copy(
            uniqueKeys = w.cfg.uniqueKeys.map { case (id, ks) =>
              id -> (if (id == atomId) ks.filterNot(_.contains(from)) else ks)
            }.filter(_._2.nonEmpty),
            refIntegrity = w.cfg.refIntegrity
              .filterNot { case (a, b) => a == atomId || b == atomId })
          return (r.cq, r.rebind(w.instances), cfg2, r.finish)
        case None => // fall through to GHD
      }
    }
    val stats = cachedStats(w.cq, w.instances)
    val dec = GHD.bestDecomposition(w.cq, stats).getOrElse(
      throw new IllegalStateException(s"${w.cq.name}: no GHD found"))
    val (cq2, inst2) = GHD.materialize(w.cq, w.instances, dec)
    (cq2, inst2, RuleConfig.default, identity)
  }
}
