package repro.core

import org.apache.spark.sql.sources
import repro.meta.Scalar
import PExpr._

/** Translation of DataSource V2 [[org.apache.spark.sql.sources.Filter]]s
  * (the V1 filter API Catalyst pushes into `SupportsPushDownFilters`)
  * into [[PExpr]].
  *
  * Every filter in this API is also *exactly row-evaluable* by
  * [[PExprEval]], so a successfully translated filter can be accepted by
  * the scan (applied in the reader) rather than left as a residual —
  * which is what lets Catalyst subsequently push LIMIT / TopN below it.
  */
object FilterTranslator {

  /** Some(pexpr) when fully translatable, None otherwise. */
  def translate(f: sources.Filter): Option[PExpr] = f match {
    case sources.EqualTo(a, v)            => lit(v).map(Cmp(CmpOp.Eq, Col(a), _))
    case sources.GreaterThan(a, v)        => lit(v).map(Cmp(CmpOp.Gt, Col(a), _))
    case sources.GreaterThanOrEqual(a, v) => lit(v).map(Cmp(CmpOp.Gte, Col(a), _))
    case sources.LessThan(a, v)           => lit(v).map(Cmp(CmpOp.Lt, Col(a), _))
    case sources.LessThanOrEqual(a, v)    => lit(v).map(Cmp(CmpOp.Lte, Col(a), _))
    case sources.In(a, vs) =>
      val scalars = vs.toSeq.map(Scalar.fromAny)
      if (scalars.forall(_.isDefined)) Some(In(Col(a), scalars.flatten)) else None
    case sources.IsNull(a)    => Some(IsNull(Col(a)))
    case sources.IsNotNull(a) => Some(IsNotNull(Col(a)))
    case sources.And(l, r) =>
      for { a <- translate(l); b <- translate(r) } yield And(a, b)
    case sources.Or(l, r) =>
      for { a <- translate(l); b <- translate(r) } yield Or(a, b)
    case sources.Not(x)   => translate(x).map(Not(_))
    case sources.StringStartsWith(a, p) => Some(StartsWith(Col(a), p))
    case sources.StringEndsWith(a, p)   => Some(EndsWith(Col(a), p))
    case sources.StringContains(a, p)   => Some(Contains(Col(a), p))
    case _: sources.AlwaysTrue  => Some(LitBool(true))
    case _: sources.AlwaysFalse => Some(LitBool(false))
    case _ => None
  }

  private def lit(v: Any): Option[PExpr] = Scalar.fromAny(v).map(Lit(_))
}
