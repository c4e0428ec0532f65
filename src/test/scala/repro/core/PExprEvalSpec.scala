package repro.core

import org.scalatest.funsuite.AnyFunSuite

import repro.meta.Scalar
import PExpr._

/** Row-level SQL semantics: null propagation, three-valued logic, LIKE. */
class PExprEvalSpec extends AnyFunSuite {

  import Scalar._

  private def row(vals: (String, Scalar)*): PExprEval.RowLookup = {
    val m = vals.toMap
    name => m.get(name).flatMap(Option(_))
  }

  test("comparisons with NULL are NULL, and NULL rows do not pass") {
    val r = row("x" -> null)
    assert(PExprEval.evalPred(Cmp(CmpOp.Gt, Col("x"), lit(5L)), r).isEmpty)
    assert(!PExprEval.passes(Cmp(CmpOp.Gt, Col("x"), lit(5L)), r))
  }

  test("three-valued AND/OR short circuits") {
    val r = row("x" -> null, "y" -> LongV(10))
    val nullCmp = Cmp(CmpOp.Gt, Col("x"), lit(5L))
    val trueCmp = Cmp(CmpOp.Gt, Col("y"), lit(5L))
    val falseCmp = Cmp(CmpOp.Lt, Col("y"), lit(5L))
    assert(PExprEval.evalPred(And(nullCmp, falseCmp), r).contains(false)) // NULL AND FALSE = FALSE
    assert(PExprEval.evalPred(And(nullCmp, trueCmp), r).isEmpty)          // NULL AND TRUE = NULL
    assert(PExprEval.evalPred(Or(nullCmp, trueCmp), r).contains(true))    // NULL OR TRUE = TRUE
    assert(PExprEval.evalPred(Or(nullCmp, falseCmp), r).isEmpty)          // NULL OR FALSE = NULL
  }

  test("NOT of NULL is NULL; IS NOT TRUE of NULL is TRUE") {
    val r = row("x" -> null)
    val p = Cmp(CmpOp.Gt, Col("x"), lit(5L))
    assert(PExprEval.evalPred(Not(p), r).isEmpty)
    assert(PExprEval.evalPred(IsNotTrue(p), r).contains(true))
  }

  test("arithmetic null propagation and division by zero") {
    val r = row("x" -> LongV(10), "n" -> null, "z" -> LongV(0))
    assert(PExprEval.evalValue(Arith(ArithOp.Add, Col("x"), Col("n")), r).isEmpty)
    assert(PExprEval.evalValue(Arith(ArithOp.Div, Col("x"), Col("z")), r).isEmpty)
    assert(PExprEval.evalValue(Arith(ArithOp.Mul, Col("x"), lit(3L)), r)
      .contains(DoubleV(30.0)))
  }

  test("IF takes else-branch on false AND on null condition") {
    val r = row("x" -> null, "a" -> LongV(1), "b" -> LongV(2))
    val e = If(Cmp(CmpOp.Gt, Col("x"), lit(0L)), Col("a"), Col("b"))
    assert(PExprEval.evalValue(e, r).contains(LongV(2)))
  }

  test("CASE WHEN picks the first true branch, else otherwise") {
    val r = row("x" -> LongV(5))
    val e = CaseWhen(Seq(
      (Cmp(CmpOp.Gt, Col("x"), lit(10L)), lit(1L)),
      (Cmp(CmpOp.Gt, Col("x"), lit(3L)), lit(2L))), Some(lit(3L)))
    assert(PExprEval.evalValue(e, r).contains(LongV(2)))
    val r2 = row("x" -> LongV(0))
    assert(PExprEval.evalValue(e, r2).contains(LongV(3)))
  }

  test("LIKE pattern semantics: %, _, regex metacharacters are literal") {
    val r = row("s" -> StringV("Marked-Alpine-Ridge"))
    assert(PExprEval.passes(Like(Col("s"), "Marked-%-Ridge"), r))
    assert(PExprEval.passes(Like(Col("s"), "Marked-Alpine-Ridg_"), r))
    assert(!PExprEval.passes(Like(Col("s"), "Marked-%-Peak"), r))
    val dots = row("s" -> StringV("a.b"))
    assert(PExprEval.passes(Like(Col("s"), "a.b"), dots))
    assert(!PExprEval.passes(Like(Col("s"), "axb"), dots)) // '.' is literal
  }

  test("string predicates") {
    val r = row("s" -> StringV("Alpine Ibex"))
    assert(PExprEval.passes(StartsWith(Col("s"), "Alp"), r))
    assert(PExprEval.passes(EndsWith(Col("s"), "bex"), r))
    assert(PExprEval.passes(Contains(Col("s"), "ne I"), r))
    assert(!PExprEval.passes(StartsWith(Col("s"), "alp"), r)) // case sensitive
  }

  test("IN with null input yields null; with match yields true") {
    assert(PExprEval.evalPred(In(Col("s"), Seq(StringV("a"))), row("s" -> null)).isEmpty)
    assert(PExprEval.passes(In(Col("s"), Seq(StringV("a"), StringV("b"))), row("s" -> StringV("b"))))
  }

  test("IS NULL / IS NOT NULL never return null") {
    assert(PExprEval.evalPred(IsNull(Col("x")), row("x" -> null)).contains(true))
    assert(PExprEval.evalPred(IsNotNull(Col("x")), row("x" -> null)).contains(false))
    assert(PExprEval.evalPred(IsNull(Col("x")), row("x" -> LongV(1))).contains(false))
  }

  test("cross-family comparison yields null (incomparable)") {
    val r = row("x" -> LongV(1))
    assert(PExprEval.evalPred(Cmp(CmpOp.Eq, Col("x"), lit("one")), r).isEmpty)
  }

  test("Opaque throws on row evaluation (must never reach the reader)") {
    intercept[IllegalStateException] {
      PExprEval.evalPred(Opaque("udf"), row("x" -> LongV(1)))
    }
  }

  test("date comparisons") {
    val r = row("d" -> DateV(1000))
    assert(PExprEval.passes(Cmp(CmpOp.Gte, Col("d"), dateLit(1000)), r))
    assert(!PExprEval.passes(Cmp(CmpOp.Lt, Col("d"), dateLit(1000)), r))
  }
}
