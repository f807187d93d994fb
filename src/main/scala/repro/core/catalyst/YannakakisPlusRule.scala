package repro.core.catalyst

import scala.util.{Failure, Success, Try}

import org.apache.spark.sql.catalyst.expressions._
import org.apache.spark.sql.catalyst.expressions.aggregate._
import org.apache.spark.sql.catalyst.plans.logical.{Aggregate, Join => LJoin, LogicalPlan, Project => LProject}
import org.apache.spark.sql.catalyst.plans.{Inner, LeftSemi}
import org.apache.spark.sql.catalyst.plans.logical.JoinHint
import org.apache.spark.sql.catalyst.rules.Rule
import org.apache.spark.sql.catalyst.trees.TreeNodeTag
import org.apache.spark.sql.types.{DataType, DecimalType, LongType}

import repro.core._

/** Catalyst integration of Yannakakis+: a `Rule[LogicalPlan]` (inject via
  * `spark.experimental.extraOptimizations`) that recognizes an
  * `Aggregate` over a tree of inner equi-joins, extracts the conjunctive
  * query, plans it with [[YannakakisPlus]], and rebuilds the Yannakakis+
  * DAG out of standard Catalyst nodes: `LeftSemi` joins for ⋉ and partial
  * `Aggregate`s for the ⊕-folding projections.
  *
  * Scope (anything else is left untouched):
  *  - joins: `Inner` with conjunctions of `attr = attr`;
  *  - grouping expressions: plain attribute references;
  *  - aggregates: non-distinct `COUNT(*)`/`COUNT(1)`, `SUM(e)`, `MIN(e)`,
  *    `MAX(e)` where `e`'s references live in one leaf (or, for SUM, a
  *    product of two single-leaf factors), with non-decimal types;
  *  - the extracted query must be acyclic and span ≥ 3 relations.
  *
  * The rewritten subtree is tagged so the fixed-point optimizer batch is
  * idempotent, and the rewrite is discarded unless the rebuilt plan
  * reproduces the original output schema exactly.
  */
object YannakakisPlusRule extends Rule[LogicalPlan] {

  val Tag: TreeNodeTag[Boolean] = TreeNodeTag[Boolean]("yannakakisPlus")

  override def apply(plan: LogicalPlan): LogicalPlan = plan.transformDown {
    case agg: Aggregate if agg.getTagValue(Tag).isEmpty =>
      Try(rewrite(agg)) match {
        case Success(Some(newPlan)) => newPlan
        case Success(None)          => agg
        case Failure(_)             => agg
      }
  }

  // ------------------------------------------------------------------ //

  /** One relation occurrence extracted from the logical plan. */
  private final case class Leaf(id: String, plan: LogicalPlan)

  private def rewrite(agg: Aggregate): Option[LogicalPlan] = {
    // 1. Flatten the inner-equi-join tree under the aggregate.
    val (leaves0, equalities) = collectJoins(agg.child)
    if (leaves0.size < 3) return None
    val leaves = leaves0.zipWithIndex.map { case (p, i) => Leaf(s"t$i", p) }

    // 2. Attribute equivalence classes from the equi-conditions.
    val leafOf: Map[ExprId, String] = (for {
      l <- leaves; a <- l.plan.output
    } yield a.exprId -> l.id).toMap
    if (equalities.exists { case (a, b) =>
      !leafOf.contains(a.exprId) || !leafOf.contains(b.exprId) }) return None

    val classOf = unionFind(equalities)
    def clsOf(a: Attribute): String =
      classOf.getOrElse(a.exprId, s"s_${a.exprId.id}")

    // Two attributes of one leaf in the same class would need an intra-
    // relation filter — out of scope.
    for (l <- leaves) {
      val cls = l.plan.output.map(clsOf)
      if (cls.distinct.size != cls.size) return None
    }

    // 3. Decompose the aggregate list.
    if (agg.groupingExpressions.exists(!_.isInstanceOf[AttributeReference]))
      return None
    val groupAttrs = agg.groupingExpressions.map(_.asInstanceOf[AttributeReference])
    if (groupAttrs.exists(a => !leafOf.contains(a.exprId))) return None

    val specs = agg.aggregateExpressions.map(ne => decompose(ne, groupAttrs, leafOf))
    if (specs.exists(_.isEmpty)) return None
    val outCols = specs.map(_.get)
    val aggCols = outCols.collect { case a: AggOut => a }

    // 4. Build the CQ over equivalence classes and plan it.
    val relevant: Map[String, Vector[Attribute]] = leaves.map { l =>
      val needed = l.plan.output.filter { a =>
        equalities.exists(e => e._1.exprId == a.exprId || e._2.exprId == a.exprId) ||
          groupAttrs.exists(_.exprId == a.exprId) ||
          aggCols.exists(_.sources.exists(_._2.references.exists(_.exprId == a.exprId)))
      }
      l.id -> needed.toVector
    }.toMap

    val atoms = leaves.map(l => Atom(l.id, relevant(l.id).map(clsOf).toVector))
    val aggSpecs = aggCols.zipWithIndex.map { case (a, i) =>
      AggSpec(s"a$i", a.semiring,
        a.sources.map { case (leafId, _) => leafId -> "catalyst" }.toMap)
    }
    val cq = CQ("catalyst", atoms.toVector,
      groupAttrs.map(clsOf).distinct.toVector, aggSpecs.toVector)
    if (!Hypergraph.isAcyclic(cq)) return None

    val irPlan = YannakakisPlus.plan(cq)

    // 5. Translate the IR DAG back into Catalyst operators.
    val tr = new Translator(cq, leaves, relevant, clsOf, aggCols.toVector)
    val (rootPlan, attrMap, annotMap) = tr.translate(irPlan.root)

    // 6. Final aggregate reproducing the original output schema.
    val finalGrouping = groupAttrs.map(a => attrMap(clsOf(a)))
    var aggIdx = -1
    val finalAggs: Seq[NamedExpression] = outCols.map {
      case g: GroupOut =>
        Alias(attrMap(clsOf(g.attr)), g.name)(exprId = g.exprId)
      case a: AggOut =>
        aggIdx += 1
        val vAttr = annotMap.getOrElse(aggIdx,
          throw new IllegalStateException(s"annotation $aggIdx missing at root"))
        val folded: Expression = a.fold(vAttr)
        Alias(folded, a.name)(exprId = a.exprId)
    }
    val result = Aggregate(finalGrouping, finalAggs.toSeq, rootPlan, None)
    result.setTagValue(Tag, true)

    // 7. Only accept schema-identical rewrites.
    val same = result.output.size == agg.output.size &&
      result.output.zip(agg.output).forall { case (n, o) =>
        n.exprId == o.exprId && n.name == o.name && n.dataType == o.dataType
      }
    if (same) Some(result) else None
  }

  /** Recursively collect leaves and equalities through inner equi-joins
    * and attribute-only projections.
    */
  private def collectJoins(plan: LogicalPlan)
      : (Vector[LogicalPlan], Vector[(Attribute, Attribute)]) = plan match {
    case LJoin(l, r, Inner, cond, _) if isEquiConjunction(cond) =>
      val (ll, le) = collectJoins(l)
      val (rl, re) = collectJoins(r)
      (ll ++ rl, le ++ re ++ splitEqualities(cond))
    case p @ LProject(list, child)
        if list.forall(_.isInstanceOf[AttributeReference]) =>
      collectJoins(child)
    case other => (Vector(other), Vector.empty)
  }

  private def isEquiConjunction(cond: Option[Expression]): Boolean = cond match {
    case None => false
    case Some(e) => splitConjuncts(e).forall {
      case EqualTo(_: AttributeReference, _: AttributeReference) => true
      case _ => false
    }
  }

  private def splitConjuncts(e: Expression): Seq[Expression] = e match {
    case And(l, r) => splitConjuncts(l) ++ splitConjuncts(r)
    case other     => Seq(other)
  }

  private def splitEqualities(cond: Option[Expression]): Vector[(Attribute, Attribute)] =
    cond.toVector.flatMap(splitConjuncts(_).collect {
      case EqualTo(a: AttributeReference, b: AttributeReference) => (a, b)
    })

  /** Union-find over equalities; returns exprId -> class name. */
  private def unionFind(eqs: Vector[(Attribute, Attribute)]): Map[ExprId, String] = {
    val parent = collection.mutable.Map.empty[ExprId, ExprId]
    def find(x: ExprId): ExprId = {
      val p = parent.getOrElse(x, x)
      if (p == x) x else { val r = find(p); parent(x) = r; r }
    }
    eqs.foreach { case (a, b) => parent(find(a.exprId)) = find(b.exprId) }
    val ids = eqs.flatMap { case (a, b) => Vector(a.exprId, b.exprId) }.distinct
    ids.map(id => id -> s"c_${find(id).id}").toMap
  }

  // ------------------------------------------------- aggregate decomp --

  private sealed trait OutCol
  private final case class GroupOut(attr: AttributeReference, name: String,
                                    exprId: ExprId) extends OutCol {
    def this(a: AttributeReference) = this(a, a.name, a.exprId)
  }
  private object GroupOut {
    def apply(a: AttributeReference): GroupOut = GroupOut(a, a.name, a.exprId)
  }

  /** One supported aggregate: its semiring role, per-leaf source
    * expressions, and how to fold/finish the annotation at the top.
    */
  private final case class AggOut(
      name: String, exprId: ExprId, semiring: Semiring,
      sources: Vector[(String, Expression)], // (leafId, annotation expr)
      annotType: DataType,
      foldFn: Expression => AggregateFunction,
      finishFn: Expression => Expression) extends OutCol {
    def fold(v: Expression): Expression = finishFn(foldFn(v).toAggregateExpression())
  }

  private def decompose(ne: NamedExpression, groupAttrs: Seq[AttributeReference],
                        leafOf: Map[ExprId, String]): Option[OutCol] = ne match {
    case a: AttributeReference if groupAttrs.exists(_.exprId == a.exprId) =>
      Some(GroupOut(a))
    case Alias(a: AttributeReference, name)
        if groupAttrs.exists(_.exprId == a.exprId) =>
      Some(GroupOut(a, name, ne.exprId))
    case al @ Alias(AggregateExpression(fn, Complete, false, None, _), name) =>
      decomposeFn(fn, leafOf).map { case (sr, srcs, tpe, fold, fin) =>
        AggOut(name, al.exprId, sr, srcs, tpe, fold, fin)
      }
    case _ => None
  }

  private def singleLeaf(e: Expression, leafOf: Map[ExprId, String]): Option[String] = {
    val ls = e.references.toSeq.flatMap(a => leafOf.get(a.exprId)).distinct
    if (ls.size == 1 && e.references.toSeq.forall(a => leafOf.contains(a.exprId))) Some(ls.head)
    else None
  }

  private def decomposeFn(fn: AggregateFunction, leafOf: Map[ExprId, String])
      : Option[(Semiring, Vector[(String, Expression)], DataType,
                Expression => AggregateFunction, Expression => Expression)] = {
    def noDecimal(e: Expression): Boolean = !e.dataType.isInstanceOf[DecimalType]
    fn match {
      case Count(Seq(Literal(_, _))) =>
        Some((Semiring.CountProduct, Vector.empty, LongType,
          (v: Expression) => Sum(v),
          (v: Expression) => Coalesce(Seq(v, Literal(0L)))))
      case Sum(e, _) if noDecimal(e) =>
        val tpe = Sum(e).dataType
        val sources: Option[Vector[(String, Expression)]] = singleLeaf(e, leafOf) match {
          case Some(l) => Some(Vector(l -> Cast(e, tpe)))
          case None => e match {
            case Multiply(x, y, _) =>
              (singleLeaf(x, leafOf), singleLeaf(y, leafOf)) match {
                case (Some(lx), Some(ly)) if lx != ly =>
                  Some(Vector(lx -> Cast(x, tpe), ly -> Cast(y, tpe)))
                case _ => None
              }
            case _ => None
          }
        }
        sources.map { s =>
          (Semiring.SumProduct, s, tpe,
            (v: Expression) => Sum(v), (v: Expression) => v)
        }
      case Min(e) if noDecimal(e) =>
        singleLeaf(e, leafOf).map { l =>
          (Semiring.MinSum, Vector(l -> e), e.dataType,
            (v: Expression) => Min(v), (v: Expression) => v)
        }
      case Max(e) if noDecimal(e) =>
        singleLeaf(e, leafOf).map { l =>
          (Semiring.MaxSum, Vector(l -> e), e.dataType,
            (v: Expression) => Max(v), (v: Expression) => v)
        }
      case _ => None
    }
  }

  // ------------------------------------------------------- translator --

  /** Translates IR operators to Catalyst plans. For each operator we track
    * (plan, class -> attribute, annotIdx -> attribute).
    */
  private final class Translator(cq: CQ, leaves: Vector[Leaf],
                                 relevant: Map[String, Vector[Attribute]],
                                 clsOf: Attribute => String,
                                 aggCols: Vector[AggOut]) {

    private val leafById = leaves.map(l => l.id -> l).toMap
    private val memo =
      collection.mutable.Map.empty[Op, (LogicalPlan, Map[String, Attribute], Map[Int, Attribute])]

    def translate(op: Op): (LogicalPlan, Map[String, Attribute], Map[Int, Attribute]) =
      memo.getOrElseUpdate(op, op match {
        case s: Scan      => scan(s)
        case p: Project   => project(p)
        case j: Join      => join(j)
        case sj: SemiJoin => semi(sj)
      })

    private def scan(s: Scan): (LogicalPlan, Map[String, Attribute], Map[Int, Attribute]) = {
      val leaf = leafById(s.atomId)
      val attrs = relevant(s.atomId)
      val annots = aggCols.zipWithIndex.flatMap { case (a, i) =>
        a.sources.find(_._1 == s.atomId).map { case (_, e) =>
          i -> Alias(e, s"__v$i")()
        }
      }
      val proj = LProject((attrs ++ annots.map(_._2)).toSeq, leaf.plan)
      (proj,
        attrs.map(a => clsOf(a) -> (a: Attribute)).toMap,
        annots.map { case (i, al) => i -> al.toAttribute }.toMap)
    }

    private def project(p: Project): (LogicalPlan, Map[String, Attribute], Map[Int, Attribute]) = {
      val (child, am, vm) = translate(p.child)
      val keepAttrs = p.keep.map(am)
      if (!p.dedupe) {
        val cols = keepAttrs ++ p.child.annots.toVector.sorted.map(vm)
        (LProject(cols.toSeq, child),
          p.keep.map(c => c -> am(c)).toMap,
          p.child.annots.toVector.sorted.map(i => i -> vm(i)).toMap)
      } else {
        val present = p.child.annots.toVector.sorted.map { i =>
          i -> Alias(fold(i, vm(i)), s"__v$i")()
        }
        val counted = (cq.sumLikeAnnots -- p.child.annots).toVector.sorted.map { i =>
          val cnt = Count(Literal(1)).toAggregateExpression()
          i -> Alias(Cast(cnt, aggCols(i).annotType), s"__v$i")()
        }
        val aggList = keepAttrs.map(a => a: NamedExpression) ++
          (present ++ counted).map(_._2)
        val plan = Aggregate(keepAttrs.toSeq, aggList.toSeq, child, None)
        plan.setTagValue(Tag, true)
        (plan,
          p.keep.map(c => c -> am(c)).toMap,
          (present ++ counted).map { case (i, al) => i -> al.toAttribute }.toMap)
      }
    }

    private def fold(i: Int, v: Attribute): Expression =
      aggCols(i).foldFn(v).toAggregateExpression()

    private def join(j: Join): (LogicalPlan, Map[String, Attribute], Map[Int, Attribute]) = {
      val (l, lam, lvm) = translate(j.left)
      val (r, ram, rvm) = translate(j.right)
      val common = j.left.attrs.filter(j.right.attrSet)
      val cond = common.map(c => EqualTo(lam(c), ram(c)): Expression)
        .reduceOption(And)
      val joined = LJoin(l, r, Inner, cond, JoinHint.NONE)
      // Merge annotations; keep the left attribute for shared classes.
      val am = ram.map { case (c, a) => c -> lam.getOrElse(c, a) }  ++ lam
      val annots = (j.left.annots ++ j.right.annots).toVector.sorted.map { i =>
        (lvm.get(i), rvm.get(i)) match {
          case (Some(a), Some(b)) =>
            val times = cq.aggs(i).semiring match {
              case Semiring.SumProduct | Semiring.CountProduct => Multiply(a, b)
              case _ => throw new IllegalStateException("single-source annotation on both sides")
            }
            i -> Alias(times, s"__v$i")()
          case (Some(a), None) => i -> Alias(a, s"__v$i")()
          case (None, Some(b)) => i -> Alias(b, s"__v$i")()
          case _ => throw new IllegalStateException("missing annotation")
        }
      }
      val attrCols = j.attrs.map(am)
      val proj = LProject((attrCols.map(a => a: NamedExpression) ++ annots.map(_._2)).toSeq, joined)
      (proj, j.attrs.map(c => c -> am(c)).toMap,
        annots.map { case (i, al) => i -> al.toAttribute }.toMap)
    }

    private def semi(sj: SemiJoin): (LogicalPlan, Map[String, Attribute], Map[Int, Attribute]) = {
      val (l, lam, lvm) = translate(sj.left)
      val (r, ram, _) = translate(sj.right)
      val common = sj.left.attrs.filter(sj.right.attrSet)
      val cond = common.map(c => EqualTo(lam(c), ram(c)): Expression)
        .reduceOption(And)
      (LJoin(l, r, LeftSemi, cond, JoinHint.NONE), lam, lvm)
    }
  }
}

/** Convenience installer. */
object YannakakisPlusExtension {
  def install(spark: org.apache.spark.sql.SparkSession): Unit =
    if (!spark.experimental.extraOptimizations.contains(YannakakisPlusRule))
      spark.experimental.extraOptimizations =
        spark.experimental.extraOptimizations :+ YannakakisPlusRule

  def uninstall(spark: org.apache.spark.sql.SparkSession): Unit =
    spark.experimental.extraOptimizations =
      spark.experimental.extraOptimizations.filterNot(_ == YannakakisPlusRule)
}
