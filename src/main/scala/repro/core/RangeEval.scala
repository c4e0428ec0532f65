package repro.core

import repro.meta._
import PExpr._

/** Metadata-only (zone-map) evaluation of pruning expressions (§3.1).
  *
  * Value expressions evaluate to a conservative [[RangeEval.VR]] — a min/max
  * hull of all values the expression can take on rows of the partition, plus
  * nullability flags.
  *
  * Predicates evaluate to an [[RangeEval.Outcomes]] — the *superset* of
  * row-level SQL outcomes (TRUE / FALSE / NULL) that rows of the partition
  * can produce. This is strictly more precise than three-valued logic:
  * SQL's NULL must be tracked separately or `NOT p` would wrongly certify
  * fully-matching partitions over nullable columns.
  *
  * Soundness contract (property-tested): if some row of the partition
  * evaluates the predicate to outcome o, then o is in the computed set.
  * Over-approximation is allowed; under-approximation is a correctness bug.
  */
object RangeEval {

  /** Derived value info: hull range over non-null outcomes (None = unknown),
    * whether some row may produce null, and whether every row produces null.
    */
  final case class VR(range: Option[ValueRange], mayBeNull: Boolean, allNull: Boolean)

  private val unknownVR = VR(None, mayBeNull = true, allNull = false)

  /** Possible row-level outcomes of a predicate on this partition. */
  final case class Outcomes(t: Boolean, f: Boolean, n: Boolean) {
    /** Partition may contain a qualifying row. */
    def mayMatch: Boolean = t
    /** Every row qualifies: neither FALSE nor NULL is possible. */
    def allTrue: Boolean = t && !f && !n
    /** Projection to three-valued logic for reporting. */
    def tri: Tri =
      if (!t) Tri.False
      else if (allTrue) Tri.True
      else Tri.Unknown
  }

  private val T = Outcomes(t = true, f = false, n = false)
  private val F = Outcomes(t = false, f = true, n = false)
  private val N = Outcomes(t = false, f = false, n = true)
  private val TF = Outcomes(t = true, f = true, n = false)
  private val TFN = Outcomes(t = true, f = true, n = true)

  private def withNull(o: Outcomes, mayBeNull: Boolean): Outcomes =
    if (mayBeNull) o.copy(n = true) else o

  def evalValue(e: PExpr, meta: PartitionMeta): VR = e match {
    case Col(n) =>
      meta.col(n) match {
        case None        => unknownVR // unknown column: cannot reason
        case Some(stats) =>
          VR(stats.range, stats.hasNulls, stats.allNull(meta.rowCount))
      }
    case Lit(v)  => VR(Some(ValueRange.point(v)), mayBeNull = false, allNull = false)
    case NullLit => VR(None, mayBeNull = true, allNull = true)

    case Arith(op, l, r) =>
      val (a, b) = (evalValue(l, meta), evalValue(r, meta))
      val range = for {
        ra <- a.range; rb <- b.range
        out <- op match {
          case ArithOp.Add => ValueRange.add(ra, rb)
          case ArithOp.Sub => ValueRange.subtract(ra, rb)
          case ArithOp.Mul => ValueRange.multiply(ra, rb)
          case ArithOp.Div => ValueRange.divide(ra, rb)
        }
      } yield out
      // Division may yield NULL (divide-by-zero) even on non-null inputs.
      val divNull = op == ArithOp.Div
      VR(range, a.mayBeNull || b.mayBeNull || divNull, a.allNull || b.allNull)

    case Neg(x) =>
      val a = evalValue(x, meta)
      VR(a.range.flatMap(ValueRange.negate), a.mayBeNull, a.allNull)

    case If(c, t, f) =>
      val co = evalOutcomes(c, meta)
      if (co.t && !co.f && !co.n) evalValue(t, meta)
      else if (!co.t) evalValue(f, meta) // false and NULL both take else
      else {
        val (a, b) = (evalValue(t, meta), evalValue(f, meta))
        val hull = for { ra <- a.range; rb <- b.range; u <- ra.union(rb) } yield u
        VR(hull, a.mayBeNull || b.mayBeNull, a.allNull && b.allNull)
      }

    case CaseWhen(branches, otherwise) =>
      evalValue(desugarCase(branches, otherwise), meta)

    case _: Cmp | _: And | _: Or | _: Not | _: LitBool | _: In | _: Like |
         _: StartsWith | _: EndsWith | _: Contains | _: IsNull | _: IsNotNull |
         _: IsNotTrue =>
      // A predicate used in value position (boolean expression).
      val o = evalOutcomes(e, meta)
      val range = (o.t, o.f) match {
        case (true, false) => Some(ValueRange.point(Scalar.BoolV(true)))
        case (false, true) => Some(ValueRange.point(Scalar.BoolV(false)))
        case (true, true)  => Some(ValueRange(Scalar.BoolV(false), Scalar.BoolV(true)))
        case (false, false) => None
      }
      VR(range, o.n, o.n && !o.t && !o.f)

    case Opaque(_) => unknownVR
  }

  private def desugarCase(branches: Seq[(PExpr, PExpr)], otherwise: Option[PExpr]): PExpr =
    branches.foldRight(otherwise.getOrElse(NullLit): PExpr) { case ((c, v), acc) => If(c, v, acc) }

  /** Possible row-level outcomes of a predicate, from metadata alone. */
  def evalOutcomes(e: PExpr, meta: PartitionMeta): Outcomes = e match {
    case LitBool(b) => if (b) T else F

    case And(l, r) => kleeneCombine(evalOutcomes(l, meta), evalOutcomes(r, meta), kleeneAnd)
    case Or(l, r)  => kleeneCombine(evalOutcomes(l, meta), evalOutcomes(r, meta), kleeneOr)

    case Not(x) =>
      val o = evalOutcomes(x, meta)
      Outcomes(t = o.f, f = o.t, n = o.n)

    case IsNotTrue(x) =>
      val o = evalOutcomes(x, meta)
      Outcomes(t = o.f || o.n, f = o.t, n = false)

    case Cmp(op, l, r) =>
      val (a, b) = (evalValue(l, meta), evalValue(r, meta))
      if (a.allNull || b.allNull) N
      else {
        val base = (a.range, b.range) match {
          case (Some(ra), Some(rb)) =>
            op match {
              case CmpOp.Lt  => ValueRange.ltTri(ra, rb)
              case CmpOp.Lte => ValueRange.lteTri(ra, rb)
              case CmpOp.Gt  => ValueRange.gtTri(ra, rb)
              case CmpOp.Gte => ValueRange.gteTri(ra, rb)
              case CmpOp.Eq  => ValueRange.eqTri(ra, rb)
              case CmpOp.Neq => ValueRange.eqTri(ra, rb).not
            }
          case _ => Tri.Unknown
        }
        val mayBeNull = a.mayBeNull || b.mayBeNull
        base match {
          case Tri.True    => withNull(T, mayBeNull)
          case Tri.False   => withNull(F, mayBeNull)
          case Tri.Unknown => withNull(TF, mayBeNull)
        }
      }

    case In(x, vs) =>
      val a = evalValue(x, meta)
      if (vs.isEmpty) F
      else if (a.allNull) N
      else a.range match {
        case None => withNull(TF, a.mayBeNull)
        case Some(r) =>
          val anyInside = vs.exists(r.contains)
          val isPoint   = Scalar.eq(r.min, r.max).contains(true)
          if (!anyInside) withNull(F, a.mayBeNull)
          else if (isPoint && vs.exists(v => Scalar.eq(v, r.min).contains(true)))
            withNull(T, a.mayBeNull)
          else withNull(TF, a.mayBeNull)
      }

    case Like(x, pattern) =>
      Rewrites.widenLike(x, pattern) match {
        case Rewrites.ExactExpr(p) => evalOutcomes(p, meta)
        case Rewrites.WidenedTo(p) =>
          // Imprecise rewrite (§3.1): original ⇒ widened. If the widened form
          // cannot be TRUE, neither can the original; a TRUE widened outcome
          // only tells us the original may be TRUE or FALSE.
          val w = evalOutcomes(p, meta)
          Outcomes(t = w.t, f = w.f || w.t, n = w.n)
        case Rewrites.NotWidenable =>
          val a = evalValue(x, meta)
          if (a.allNull) N else withNull(TF, a.mayBeNull)
      }

    case StartsWith(x, prefix) =>
      val a = evalValue(x, meta)
      if (a.allNull) N
      else a.range match {
        case Some(ValueRange(Scalar.StringV(mn), Scalar.StringV(mx))) =>
          val below = mx < prefix
          val above = Rewrites.prefixUpperBound(prefix).exists(ub => mn >= ub)
          if (below || above) withNull(F, a.mayBeNull)
          else if (mn.startsWith(prefix) && mx.startsWith(prefix)) withNull(T, a.mayBeNull)
          else withNull(TF, a.mayBeNull)
        case _ => withNull(TF, a.mayBeNull)
      }

    case EndsWith(x, _) =>
      val a = evalValue(x, meta)
      if (a.allNull) N else withNull(TF, a.mayBeNull)
    case Contains(x, _) =>
      val a = evalValue(x, meta)
      if (a.allNull) N else withNull(TF, a.mayBeNull)

    case IsNull(x) =>
      val a = evalValue(x, meta)
      if (a.allNull) T
      else if (!a.mayBeNull) F
      else TF

    case IsNotNull(x) =>
      val o = evalOutcomes(IsNull(x), meta)
      Outcomes(t = o.f, f = o.t, n = false)

    case If(_, _, _) | CaseWhen(_, _) =>
      // Boolean-valued conditional: evaluate as a value, map back.
      val v = evalValue(e, meta)
      if (v.allNull) N
      else v.range match {
        case Some(ValueRange(Scalar.BoolV(mn), Scalar.BoolV(mx))) =>
          withNull(Outcomes(t = mx, f = !mn, n = false), v.mayBeNull)
        case _ => withNull(TF, v.mayBeNull)
      }

    case Col(_) => evalOutcomes(Cmp(CmpOp.Eq, e, Lit(Scalar.BoolV(true))), meta)

    case Opaque(_) => TFN
    case _         => TFN
  }

  // Exact Kleene tables over individual outcomes; combining possible-outcome
  // sets by enumeration keeps the superset property.
  private sealed trait K
  private case object KT extends K; private case object KF extends K; private case object KN extends K

  private def kleeneAnd(a: K, b: K): K = (a, b) match {
    case (KF, _) | (_, KF) => KF
    case (KT, KT)          => KT
    case _                 => KN
  }
  private def kleeneOr(a: K, b: K): K = (a, b) match {
    case (KT, _) | (_, KT) => KT
    case (KF, KF)          => KF
    case _                 => KN
  }

  private def toKs(o: Outcomes): Seq[K] =
    (if (o.t) Seq(KT) else Nil) ++ (if (o.f) Seq(KF) else Nil) ++ (if (o.n) Seq(KN) else Nil)

  private def kleeneCombine(l: Outcomes, r: Outcomes, op: (K, K) => K): Outcomes = {
    var t = false; var f = false; var n = false
    for (x <- toKs(l); y <- toKs(r)) op(x, y) match {
      case KT => t = true
      case KF => f = true
      case KN => n = true
    }
    Outcomes(t, f, n)
  }

  /** Three-valued projection, used by reporting and simple tests. */
  def evalPred(e: PExpr, meta: PartitionMeta): Tri = evalOutcomes(e, meta).tri

  /** May the partition contain a matching row? (pass 1 of §4.2) */
  def mayMatch(pred: PExpr, meta: PartitionMeta): Boolean =
    meta.rowCount > 0 && evalOutcomes(pred, meta).mayMatch
}
