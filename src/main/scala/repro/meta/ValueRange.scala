package repro.meta

import Scalar._

/** A closed interval [min, max] over comparable scalars — the unit of
  * min/max range derivation (§3.1 of the paper).
  *
  * Invariant: `min <= max` whenever the two are comparable. Ranges derived
  * from expressions may legally be over-wide (conservative), never narrower
  * than the true value set.
  */
final case class ValueRange(min: Scalar, max: Scalar) {

  /** Union (hull) — used for IF/CASE branches where the branch taken is
    * unknown: the result range must cover both branches. None when the
    * branches have incomparable types.
    */
  def union(o: ValueRange): Option[ValueRange] =
    for { lo <- Scalar.min(min, o.min); hi <- Scalar.max(max, o.max) } yield ValueRange(lo, hi)

  def overlaps(o: ValueRange): Boolean =
    !(Scalar.lt(max, o.min).contains(true) || Scalar.lt(o.max, min).contains(true))

  def contains(s: Scalar): Boolean =
    Scalar.lte(min, s).contains(true) && Scalar.lte(s, max).contains(true)

  /** True iff every value of this range is certainly below every value of o. */
  def entirelyBelow(o: ValueRange): Boolean = Scalar.lt(max, o.min).contains(true)
  def entirelyAbove(o: ValueRange): Boolean = Scalar.lt(o.max, min).contains(true)
}

object ValueRange {
  def point(s: Scalar): ValueRange = ValueRange(s, s)

  private def num2(a: Scalar, b: Scalar)(f: (Double, Double) => Double): Option[Scalar] =
    for { x <- asDouble(a); y <- asDouble(b) } yield DoubleV(f(x, y))

  /** Interval arithmetic for +, -, *, / used to push ranges through scalar
    * expressions (e.g. `altit * 0.3048`). Division by a range containing 0
    * yields None (unknown — the engine keeps the partition).
    */
  def add(a: ValueRange, b: ValueRange): Option[ValueRange] =
    for { lo <- num2(a.min, b.min)(_ + _); hi <- num2(a.max, b.max)(_ + _) } yield ValueRange(lo, hi)

  def subtract(a: ValueRange, b: ValueRange): Option[ValueRange] =
    for { lo <- num2(a.min, b.max)(_ - _); hi <- num2(a.max, b.min)(_ - _) } yield ValueRange(lo, hi)

  def multiply(a: ValueRange, b: ValueRange): Option[ValueRange] = {
    val prods = for {
      x <- Seq(a.min, a.max); y <- Seq(b.min, b.max)
      p <- num2(x, y)(_ * _).toSeq
    } yield p
    if (prods.size != 4) None
    else {
      val ds = prods.map { case Scalar.DoubleV(d) => d; case _ => return None }
      Some(ValueRange(Scalar.DoubleV(ds.min), Scalar.DoubleV(ds.max)))
    }
  }

  def divide(a: ValueRange, b: ValueRange): Option[ValueRange] = {
    val zero = Scalar.DoubleV(0.0)
    if (b.contains(zero)) None
    else {
      val quots = for {
        x <- Seq(a.min, a.max); y <- Seq(b.min, b.max)
        q <- num2(x, y)(_ / _).toSeq
      } yield q
      if (quots.size != 4) None
      else {
        val ds = quots.map { case Scalar.DoubleV(d) => d; case _ => return None }
        Some(ValueRange(Scalar.DoubleV(ds.min), Scalar.DoubleV(ds.max)))
      }
    }
  }

  def negate(a: ValueRange): Option[ValueRange] =
    for { lo <- asDouble(a.max); hi <- asDouble(a.min) }
      yield ValueRange(Scalar.DoubleV(-lo), Scalar.DoubleV(-hi))

  /** Tri-state comparisons of two ranges: can `x < y` hold for (x in a, y in b)?
    * True  — holds for every pair; False — for no pair; Unknown otherwise.
    */
  def ltTri(a: ValueRange, b: ValueRange): Tri =
    if (a.entirelyBelow(b)) Tri.True
    else if (Scalar.lte(b.max, a.min).contains(true)) Tri.False
    else Tri.Unknown

  def lteTri(a: ValueRange, b: ValueRange): Tri =
    if (Scalar.lte(a.max, b.min).contains(true)) Tri.True
    else if (Scalar.lt(b.max, a.min).contains(true)) Tri.False
    else Tri.Unknown

  def gtTri(a: ValueRange, b: ValueRange): Tri  = ltTri(b, a)
  def gteTri(a: ValueRange, b: ValueRange): Tri = lteTri(b, a)

  def eqTri(a: ValueRange, b: ValueRange): Tri = {
    val pointEqual =
      Scalar.eq(a.min, a.max).contains(true) &&
      Scalar.eq(b.min, b.max).contains(true) &&
      Scalar.eq(a.min, b.min).contains(true)
    if (pointEqual) Tri.True
    else if (!a.overlaps(b)) Tri.False
    else Tri.Unknown
  }
}
