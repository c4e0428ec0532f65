package repro.meta

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.Gen
import repro.PropHelper.forAllSeeded

import Scalar._

class ValueRangeSpec extends AnyFunSuite {

  private def r(lo: Double, hi: Double) = ValueRange(DoubleV(lo), DoubleV(hi))
  private def rl(lo: Long, hi: Long)    = ValueRange(LongV(lo), LongV(hi))

  test("overlap detection") {
    assert(rl(0, 9).overlaps(rl(5, 15)))
    assert(!rl(0, 9).overlaps(rl(10, 19)))
    assert(rl(10, 19).overlaps(rl(15, 15)))
    assert(rl(5, 5).overlaps(rl(5, 5)))
  }

  test("contains") {
    assert(rl(0, 9).contains(LongV(0)))
    assert(rl(0, 9).contains(LongV(9)))
    assert(!rl(0, 9).contains(LongV(10)))
    assert(rl(0, 9).contains(DoubleV(4.5)))
  }

  test("union hulls comparable ranges; None for incomparable") {
    assert(rl(0, 5).union(rl(3, 9)).contains(rl(0, 9)))
    assert(rl(0, 5).union(ValueRange(StringV("a"), StringV("b"))).isEmpty)
  }

  test("paper example: altit * 0.3048 scales the range") {
    // altit in [934, 7674] (§3.1) → metres ≈ [284.68, 2339.04]
    val scaled = ValueRange.multiply(rl(934, 7674), ValueRange.point(DoubleV(0.3048))).get
    val (lo, hi) = (scaled.min.asInstanceOf[DoubleV].v, scaled.max.asInstanceOf[DoubleV].v)
    assert(math.abs(lo - 284.6832) < 1e-9)
    assert(math.abs(hi - 2339.0352) < 1e-9)
  }

  test("interval addition and subtraction") {
    assert(ValueRange.add(rl(1, 2), rl(10, 20)).contains(r(11, 22)))
    assert(ValueRange.subtract(rl(10, 20), rl(1, 2)).contains(r(8, 19)))
  }

  test("multiplication handles sign flips") {
    val prod = ValueRange.multiply(rl(-2, 3), rl(-5, 4)).get
    assert(prod == r(-15, 12))
  }

  test("division by a range containing zero is unknown") {
    assert(ValueRange.divide(rl(1, 2), rl(-1, 1)).isEmpty)
    assert(ValueRange.divide(rl(10, 20), rl(2, 5)).contains(r(2.0, 10.0)))
  }

  test("negate flips and swaps") {
    assert(ValueRange.negate(rl(1, 5)).contains(r(-5.0, -1.0)))
  }

  test("tri-state comparisons: the paper's f1/f2 example") {
    // f1 covers 0..9, f2 covers 10..19; predicate x >= 15.
    val f1 = rl(0, 9); val f2 = rl(10, 19); val p = ValueRange.point(LongV(15))
    assert(ValueRange.gteTri(f1, p) == Tri.False)   // f1 can be pruned
    assert(ValueRange.gteTri(f2, p) == Tri.Unknown) // f2 must be scanned
    assert(ValueRange.gteTri(rl(15, 19), p) == Tri.True)
  }

  test("ltTri/gtTri boundaries") {
    assert(ValueRange.ltTri(rl(0, 4), rl(5, 9)) == Tri.True)
    assert(ValueRange.ltTri(rl(0, 5), rl(5, 9)) == Tri.Unknown) // 5 !< 5
    assert(ValueRange.ltTri(rl(6, 9), rl(0, 5)) == Tri.False)
    assert(ValueRange.gtTri(rl(6, 9), rl(0, 5)) == Tri.True)
  }

  test("eqTri: point equality, disjoint, overlap") {
    assert(ValueRange.eqTri(rl(5, 5), rl(5, 5)) == Tri.True)
    assert(ValueRange.eqTri(rl(0, 4), rl(5, 9)) == Tri.False)
    assert(ValueRange.eqTri(rl(0, 9), rl(5, 15)) == Tri.Unknown)
  }

  val genRangePair: Gen[(Long, Long, Long, Long)] = for {
    a <- Gen.chooseNum(-100L, 100L); b <- Gen.chooseNum(-100L, 100L)
    c <- Gen.chooseNum(-100L, 100L); d <- Gen.chooseNum(-100L, 100L)
  } yield (math.min(a, b), math.max(a, b), math.min(c, d), math.max(c, d))

  test("property: interval arithmetic is conservative (contains sampled products)") {
    forAllSeeded(genRangePair, n = 300) { case (a1, a2, b1, b2) =>
      val ra = rl(a1, a2); val rb = rl(b1, b2)
      for (x <- Seq(a1, a2, (a1 + a2) / 2); y <- Seq(b1, b2, (b1 + b2) / 2)) {
        assert(ValueRange.add(ra, rb).get.contains(DoubleV((x + y).toDouble)))
        assert(ValueRange.subtract(ra, rb).get.contains(DoubleV((x - y).toDouble)))
        assert(ValueRange.multiply(ra, rb).get.contains(DoubleV((x * y).toDouble)))
      }
    }
  }

  test("property: tri-state comparisons agree with exhaustive checks") {
    forAllSeeded(genRangePair, n = 300) { case (a1, a2, b1, b2) =>
      val ra = rl(a1, a2); val rb = rl(b1, b2)
      val xs = (a1 to a2).take(50); val ys = (b1 to b2).take(50)
      val lt = for (x <- xs; y <- ys) yield x < y
      ValueRange.ltTri(ra, rb) match {
        case Tri.True    => assert(lt.forall(identity))
        case Tri.False   => assert(!lt.exists(identity))
        case Tri.Unknown => () // undecided is always allowed
      }
    }
  }
}
