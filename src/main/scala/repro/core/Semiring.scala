package repro.core

import org.apache.spark.sql.Column
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types.{DataType, DoubleType, LongType, StringType}

/** A commutative semiring `(S, ⊕, ⊗)` driving one annotation column.
  *
  * Following the FAQ/AJAR formulation (paper §2.1), every tuple carries an
  * annotation; joins combine annotations with `⊗` and aggregating
  * projections fold them with `⊕`. A query carries a *vector* of
  * annotations — one per aggregate in its SELECT list — each with its own
  * semiring; the join structure is shared while the annotation algebra is
  * applied per column (sound because distributivity holds per semiring).
  *
  * Annotation pruning (paper §5.1 "Pruning for Annotation") falls out of
  * this design: an annotation column is *absent* until its source atom (or
  * an aggregation that forces a count) materializes it, so relations whose
  * annotation would be the identity never pay for the extra column.
  */
sealed trait Semiring {
  /** Spark type of the annotation column. */
  def dataType: DataType

  /** `⊕` as a Spark aggregate over the annotation column. */
  def plus(c: Column): Column

  /** `⊗` combining two present annotation columns; None means the
    * annotation is single-source (only ever present on one join side),
    * in which case the executor passes the present side through.
    */
  def times: Option[(Column, Column) => Column]

  /** `⊕` folded over `cnt` copies of the identity `1`: for sum-like
    * semirings this is the group count (annotation pruning materializes
    * the count lazily); for idempotent semirings the annotation stays
    * absent (None) because `1 ⊕ 1 = 1`.
    */
  def countFold(cnt: Column): Option[Column]

  /** `⊕(x, x) = x`? Idempotent semirings tolerate duplicate join paths. */
  def idempotent: Boolean

  /** Final-result fixup for SQL parity (e.g. COUNT over an empty join is
    * 0 in SQL while SUM is NULL).
    */
  def finish(c: Column): Column = c

  /** The ⊗-identity `1` as a literal column, when expressible — used by
    * the annotation-pruning ablation (pruning off materializes identity
    * annotations eagerly, as a naive rewriter would).
    */
  def one: Option[Column]

  /** ⊕ spelled in SQL, for native-plan and oracle generation. */
  def plusSql: String

  /** ⊗ spelled as an infix SQL operator. */
  def timesSql: String
}

object Semiring {

  /** `(R, +, ×)` — SUM of products; the workhorse for SUM aggregates. */
  case object SumProduct extends Semiring {
    val dataType: DataType = DoubleType
    def plus(c: Column): Column = sum(c)
    val times: Option[(Column, Column) => Column] = Some(_ * _)
    def countFold(cnt: Column): Option[Column] = Some(cnt.cast(DoubleType))
    val idempotent = false
    val one: Option[Column] = Some(lit(1.0))
    val plusSql = "SUM"
    val timesSql = "*"
  }

  /** `(N, +, ×)` over longs — COUNT(*) is SUM of all-ones annotations. */
  case object CountProduct extends Semiring {
    val dataType: DataType = LongType
    def plus(c: Column): Column = sum(c)
    val times: Option[(Column, Column) => Column] = Some(_ * _)
    def countFold(cnt: Column): Option[Column] = Some(cnt.cast(LongType))
    val idempotent = false
    override def finish(c: Column): Column = coalesce(c, lit(0L))
    val one: Option[Column] = Some(lit(1L))
    // ⊕ over count annotations is a SUM; the bare COUNT(*) spelling only
    // appears where the annotation is still implicit (absent).
    val plusSql = "SUM"
    val timesSql = "*"
  }

  /** `(R ∪ {∞}, min, +)` — MIN of a value sourced from one or more atoms
    * (identity 0 elsewhere); supports e.g. MIN(a + b).
    */
  case object MinSum extends Semiring {
    val dataType: DataType = DoubleType
    def plus(c: Column): Column = min(c)
    val times: Option[(Column, Column) => Column] = Some(_ + _)
    def countFold(cnt: Column): Option[Column] = None
    val idempotent = true
    val one: Option[Column] = Some(lit(0.0))
    val plusSql = "MIN"
    val timesSql = "+"
  }

  /** `(R ∪ {-∞}, max, +)` — MAX(a + b) style aggregates (paper Ex. 2.1
    * variant MAX(ps_availqty - l_quantity)).
    */
  case object MaxSum extends Semiring {
    val dataType: DataType = DoubleType
    def plus(c: Column): Column = max(c)
    val times: Option[(Column, Column) => Column] = Some(_ + _)
    def countFold(cnt: Column): Option[Column] = None
    val idempotent = true
    val one: Option[Column] = Some(lit(0.0))
    val plusSql = "MAX"
    val timesSql = "+"
  }

  /** `(R, max, ×)` over non-negative values — MAX(a × b) (paper Ex. 5.4). */
  case object MaxProduct extends Semiring {
    val dataType: DataType = DoubleType
    def plus(c: Column): Column = max(c)
    val times: Option[(Column, Column) => Column] = Some(_ * _)
    def countFold(cnt: Column): Option[Column] = None
    val idempotent = true
    val one: Option[Column] = Some(lit(1.0))
    val plusSql = "MAX"
    val timesSql = "*"
  }

  /** MIN over strings, single-source (JOB-style MIN(t.title)). `⊗` is
    * undefined because the annotation only ever lives on one join side.
    */
  case object MinString extends Semiring {
    val dataType: DataType = StringType
    def plus(c: Column): Column = min(c)
    val times: Option[(Column, Column) => Column] = None
    def countFold(cnt: Column): Option[Column] = None
    val idempotent = true
    val one: Option[Column] = None
    val plusSql = "MIN"
    val timesSql = "||"
  }

  /** MAX over strings, single-source. */
  case object MaxString extends Semiring {
    val dataType: DataType = StringType
    def plus(c: Column): Column = max(c)
    val times: Option[(Column, Column) => Column] = None
    def countFold(cnt: Column): Option[Column] = None
    val idempotent = true
    val one: Option[Column] = None
    val plusSql = "MAX"
    val timesSql = "||"
  }

  /** MIN over doubles, single- or multi-source via +0 identity. */
  case object MinDouble extends Semiring {
    val dataType: DataType = DoubleType
    def plus(c: Column): Column = min(c)
    val times: Option[(Column, Column) => Column] = Some(_ + _)
    def countFold(cnt: Column): Option[Column] = None
    val idempotent = true
    val one: Option[Column] = Some(lit(0.0))
    val plusSql = "MIN"
    val timesSql = "+"
  }
}
