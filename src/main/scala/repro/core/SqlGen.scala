package repro.core

/** Converts a [[Plan]] into a sequence of SQL statements over temp views —
  * the paper's rewrite-based deployment (§6): "the instructions are
  * further converted into executable SQL queries", one atomic statement
  * per operator, so the target engine executes the Yannakakis+ DAG as
  * given. The dialect differences between SparkSQL and DuckDB are limited
  * to the temp-view DDL.
  */
object SqlGen {

  final case class Script(statements: Vector[String], finalQuery: String,
                          viewNames: Vector[String])

  sealed trait Dialect {
    def createView(name: String, query: String): String
  }
  case object SparkDialect extends Dialect {
    def createView(name: String, query: String): String =
      s"CREATE OR REPLACE TEMPORARY VIEW $name AS $query"
  }
  case object DuckDialect extends Dialect {
    def createView(name: String, query: String): String =
      s"CREATE OR REPLACE TEMP VIEW $name AS $query"
  }

  private def v(i: Int): String = s"__v$i"

  /** Emit the script. Base relations are expected as tables/views named by
    * atom id.
    */
  def script(plan: Plan, dialect: Dialect): Script = {
    val cq = plan.cq
    val ops = plan.ops
    val nameOf: Map[Op, String] = ops.zipWithIndex.map {
      case (o, i) => (o: Op) -> s"${sanitize(cq.name)}_op$i"
    }.toMap

    def sqlFor(op: Op): String = op match {
      case s: Scan =>
        val annots = s.annots.toVector.sorted.map { i =>
          val a = cq.aggs(i)
          val e = a.perAtom.getOrElse(s.atomId, oneLiteral(a.semiring))
          // Match the typed-executor annotation columns exactly.
          val typed = a.semiring.dataType match {
            case org.apache.spark.sql.types.DoubleType => s"CAST(($e) AS DOUBLE)"
            case org.apache.spark.sql.types.LongType   => s"CAST(($e) AS BIGINT)"
            case _                                     => s"($e)"
          }
          s"$typed AS ${v(i)}"
        }
        s"SELECT ${(s.attrs ++ annots).mkString(", ")} FROM ${s.atomId}"

      case p: Project =>
        val child = nameOf(p.child)
        if (!p.dedupe) {
          val cols = p.keep ++ p.child.annots.toVector.sorted.map(v)
          s"SELECT ${cols.mkString(", ")} FROM $child"
        } else if (cq.aggs.isEmpty) {
          s"SELECT DISTINCT ${p.keep.mkString(", ")} FROM $child"
        } else {
          val present = p.child.annots.toVector.sorted.map { i =>
            s"${cq.aggs(i).semiring.plusSql}(${v(i)}) AS ${v(i)}"
          }
          val counted = (cq.sumLikeAnnots -- p.child.annots).toVector.sorted.map { i =>
            cq.aggs(i).semiring match {
              case Semiring.CountProduct => s"CAST(COUNT(*) AS BIGINT) AS ${v(i)}"
              case _                     => s"CAST(COUNT(*) AS DOUBLE) AS ${v(i)}"
            }
          }
          val sel = (p.keep ++ present ++ counted).mkString(", ")
          val grp = if (p.keep.isEmpty) "" else s" GROUP BY ${p.keep.mkString(", ")}"
          s"SELECT $sel FROM $child$grp"
        }

      case j: Join =>
        val (l, r) = (nameOf(j.left), nameOf(j.right))
        val common = j.left.attrs.filter(j.right.attrSet)
        val cond =
          if (common.isEmpty) ""
          else common.map(x => s"l.$x = r.$x").mkString(" WHERE ", " AND ", "")
        val cols =
          j.left.attrs.map(x => s"l.$x AS $x") ++
            j.right.attrs.filterNot(j.left.attrSet).map(x => s"r.$x AS $x") ++
            (j.left.annots ++ j.right.annots).toVector.sorted.map { i =>
              val a = cq.aggs(i)
              (j.left.annots(i), j.right.annots(i)) match {
                case (true, true) =>
                  s"(l.${v(i)} ${a.semiring.timesSql} r.${v(i)}) AS ${v(i)}"
                case (true, false) => s"l.${v(i)} AS ${v(i)}"
                case _             => s"r.${v(i)} AS ${v(i)}"
              }
            }
        s"SELECT ${cols.mkString(", ")} FROM $l l, $r r$cond"

      case sj: SemiJoin =>
        val (l, r) = (nameOf(sj.left), nameOf(sj.right))
        val common = sj.left.attrs.filter(sj.right.attrSet)
        if (common.isEmpty)
          s"SELECT * FROM $l WHERE EXISTS (SELECT 1 FROM $r)"
        else {
          // Paper Table 1 spelling: WHERE key IN (SELECT DISTINCT key …).
          val keys = common.mkString(", ")
          val tuple = if (common.size == 1) keys else s"($keys)"
          s"SELECT * FROM $l WHERE $tuple IN (SELECT DISTINCT $keys FROM $r)"
        }
    }

    val statements = ops.map(o => dialect.createView(nameOf(o), sqlFor(o)))

    val rootName = nameOf(plan.root)
    val finalQuery =
      if (cq.aggs.nonEmpty) {
        val aggCols = cq.aggs.zipWithIndex.map { case (a, i) =>
          val present = plan.root.annots(i)
          val body = (present, a.semiring) match {
            case (true, Semiring.CountProduct)  => s"CAST(COALESCE(SUM(${v(i)}), 0) AS BIGINT)"
            case (true, s)                      => s"${s.plusSql}(${v(i)})"
            case (false, Semiring.CountProduct) => s"CAST(COUNT(*) AS BIGINT)"
            case (false, Semiring.SumProduct)   => "CAST(COUNT(*) AS DOUBLE)"
            case (false, s) => throw new IllegalStateException(
              s"${cq.name}: annotation ${a.alias} ($s) absent at the plan root")
          }
          s"$body AS ${a.alias}"
        }
        val sel = (cq.output ++ aggCols).mkString(", ")
        val grp = if (cq.output.isEmpty) "" else s" GROUP BY ${cq.output.mkString(", ")}"
        s"SELECT $sel FROM $rootName$grp"
      } else if (cq.distinctOutput) {
        s"SELECT DISTINCT ${cq.output.mkString(", ")} FROM $rootName"
      } else {
        s"SELECT ${cq.output.mkString(", ")} FROM $rootName"
      }

    Script(statements, finalQuery, ops.map(nameOf))
  }

  private def oneLiteral(s: Semiring): String = s match {
    case Semiring.CountProduct => "1"
    case Semiring.SumProduct | Semiring.MaxProduct => "1.0"
    case Semiring.MinSum | Semiring.MaxSum | Semiring.MinDouble => "0.0"
    case other => throw new IllegalStateException(s"no SQL identity for $other")
  }

  private def sanitize(name: String): String =
    name.replaceAll("[^A-Za-z0-9_]", "_")
}
