package repro.core

import org.apache.spark.sql.catalyst.analysis.{UnresolvedAttribute, UnresolvedFunction}
import org.apache.spark.sql.catalyst.expressions._
import org.apache.spark.sql.types._
import org.apache.spark.unsafe.types.UTF8String

import repro.meta.Scalar
import PExpr.{Arith, ArithOp, Cmp, CmpOp, Col, Lit, NullLit, Neg, Opaque}

/** Best-effort translation of Catalyst [[Expression]]s into [[PExpr]].
  *
  * Anything outside the modelled fragment becomes [[PExpr.Opaque]], which the
  * range evaluator treats as undecidable — the partition is kept. That makes
  * the translation safe to run on arbitrary user predicates: translation
  * gaps cost pruning opportunity, never correctness.
  *
  * Both resolved plans (AttributeReference) and freshly parsed expressions
  * (UnresolvedAttribute / UnresolvedFunction) are accepted, so tests can
  * write predicates as SQL strings via `sparkSession.sessionState.sqlParser`.
  */
object CatalystTranslator {

  def translate(e: Expression): PExpr = e match {
    case a: AttributeReference => Col(a.name)
    case a: UnresolvedAttribute => Col(a.nameParts.last)

    case Literal(null, _) => NullLit
    case Literal(v, dt) => literal(v, dt)

    case Cast(child, dt, _, _) => cast(child, dt)

    case Add(l, r, _)      => Arith(ArithOp.Add, translate(l), translate(r))
    case Subtract(l, r, _) => Arith(ArithOp.Sub, translate(l), translate(r))
    case Multiply(l, r, _) => Arith(ArithOp.Mul, translate(l), translate(r))
    case Divide(l, r, _)   => Arith(ArithOp.Div, translate(l), translate(r))
    case UnaryMinus(x, _)  => Neg(translate(x))

    case org.apache.spark.sql.catalyst.expressions.If(c, t, f) => PExpr.If(translate(c), translate(t), translate(f))
    case org.apache.spark.sql.catalyst.expressions.CaseWhen(branches, otherwise) =>
      PExpr.CaseWhen(branches.map { case (c, v) => (translate(c), translate(v)) },
                     otherwise.map(translate))

    case LessThan(l, r)           => Cmp(CmpOp.Lt, translate(l), translate(r))
    case LessThanOrEqual(l, r)    => Cmp(CmpOp.Lte, translate(l), translate(r))
    case GreaterThan(l, r)        => Cmp(CmpOp.Gt, translate(l), translate(r))
    case GreaterThanOrEqual(l, r) => Cmp(CmpOp.Gte, translate(l), translate(r))
    case EqualTo(l, r)            => Cmp(CmpOp.Eq, translate(l), translate(r))

    case org.apache.spark.sql.catalyst.expressions.And(l, r) => PExpr.And(translate(l), translate(r))
    case org.apache.spark.sql.catalyst.expressions.Or(l, r)  => PExpr.Or(translate(l), translate(r))
    case org.apache.spark.sql.catalyst.expressions.Not(x)    => PExpr.Not(translate(x))

    case org.apache.spark.sql.catalyst.expressions.In(x, list) =>
      val scalars = list.map {
        case Literal(v, dt) => scalarOf(v, dt)
        case _              => None
      }
      if (scalars.forall(_.isDefined)) PExpr.In(translate(x), scalars.flatten)
      else Opaque(s"IN with non-literal list: $e")

    case InSet(x, set) =>
      val scalars = set.toSeq.map(v => Scalar.fromAny(v).orElse(utf8(v)))
      if (scalars.forall(_.isDefined)) PExpr.In(translate(x), scalars.flatten)
      else Opaque(s"INSET with unsupported values: $e")

    case org.apache.spark.sql.catalyst.expressions.Like(x, Literal(p: UTF8String, StringType), _) => PExpr.Like(translate(x), p.toString)
    case org.apache.spark.sql.catalyst.expressions.StartsWith(x, Literal(p: UTF8String, StringType)) => PExpr.StartsWith(translate(x), p.toString)
    case org.apache.spark.sql.catalyst.expressions.EndsWith(x, Literal(p: UTF8String, StringType))   => PExpr.EndsWith(translate(x), p.toString)
    case org.apache.spark.sql.catalyst.expressions.Contains(x, Literal(p: UTF8String, StringType))   => PExpr.Contains(translate(x), p.toString)

    case org.apache.spark.sql.catalyst.expressions.IsNull(x)    => PExpr.IsNull(translate(x))
    case org.apache.spark.sql.catalyst.expressions.IsNotNull(x) => PExpr.IsNotNull(translate(x))

    case f: UnresolvedFunction =>
      (f.nameParts.last.toLowerCase, f.arguments) match {
        case ("if" | "iff", Seq(c, t, e2))  => PExpr.If(translate(c), translate(t), translate(e2))
        case ("startswith", Seq(x, Literal(p: UTF8String, StringType))) =>
          PExpr.StartsWith(translate(x), p.toString)
        case ("endswith", Seq(x, Literal(p: UTF8String, StringType))) =>
          PExpr.EndsWith(translate(x), p.toString)
        case ("contains", Seq(x, Literal(p: UTF8String, StringType))) =>
          PExpr.Contains(translate(x), p.toString)
        case _ => Opaque(s"function ${f.nameParts.mkString(".")}")
      }

    case other => Opaque(other.getClass.getSimpleName)
  }

  /** Casts are passed through only when value-widening (sound for ranges);
    * narrowing casts would need rounding-aware range math, so they opt out.
    */
  private def cast(child: Expression, dt: DataType): PExpr = dt match {
    case LongType | DoubleType | FloatType | _: DecimalType => translate(child)
    case IntegerType | ShortType | ByteType =>
      child.dataType match {
        case ByteType | ShortType | IntegerType | LongType => translate(child)
        case _ => Opaque(s"narrowing cast to $dt")
      }
    case StringType if child.dataType == StringType => translate(child)
    case DateType if child.dataType == DateType     => translate(child)
    case _ => Opaque(s"cast to $dt")
  }

  private def literal(v: Any, dt: DataType): PExpr =
    scalarOf(v, dt).map(Lit(_): PExpr).getOrElse(Opaque(s"literal $v: $dt"))

  private def scalarOf(v: Any, dt: DataType): Option[Scalar] = (v, dt) match {
    case (d: Integer, DateType)  => Some(Scalar.DateV(d))
    case (s: UTF8String, _)      => Some(Scalar.StringV(s.toString))
    case (d: Decimal, _)         => Some(Scalar.DoubleV(d.toDouble))
    case _                       => Scalar.fromAny(v)
  }

  private def utf8(v: Any): Option[Scalar] = v match {
    case s: UTF8String => Some(Scalar.StringV(s.toString))
    case _             => None
  }
}
