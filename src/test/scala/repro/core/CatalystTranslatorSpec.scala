package repro.core

import repro.SparkSpec
import repro.meta.Scalar
import PExpr._

/** Translation of real parsed Catalyst expressions into the pruning AST. */
class CatalystTranslatorSpec extends SparkSpec {

  private def parse(sql: String): PExpr =
    CatalystTranslator.translate(spark.sessionState.sqlParser.parseExpression(sql))

  test("simple comparison with integer literal") {
    assert(parse("x > 5") == Cmp(CmpOp.Gt, Col("x"), Lit(Scalar.LongV(5))))
  }

  test("all comparison operators") {
    assert(parse("x < 5") == Cmp(CmpOp.Lt, Col("x"), Lit(Scalar.LongV(5))))
    assert(parse("x <= 5") == Cmp(CmpOp.Lte, Col("x"), Lit(Scalar.LongV(5))))
    assert(parse("x >= 5") == Cmp(CmpOp.Gte, Col("x"), Lit(Scalar.LongV(5))))
    assert(parse("x = 5") == Cmp(CmpOp.Eq, Col("x"), Lit(Scalar.LongV(5))))
  }

  test("double and string literals") {
    assert(parse("d > 0.25") match {
      case Cmp(CmpOp.Gt, Col("d"), Lit(Scalar.DoubleV(v))) => math.abs(v - 0.25) < 1e-12
      case other => fail(other.toString)
    })
    assert(parse("s = 'feet'") == Cmp(CmpOp.Eq, Col("s"), Lit(Scalar.StringV("feet"))))
  }

  test("date literal translates to DateV") {
    parse("dt >= DATE'1995-01-01'") match {
      case Cmp(CmpOp.Gte, Col("dt"), Lit(Scalar.DateV(days))) =>
        assert(days == java.time.LocalDate.parse("1995-01-01").toEpochDay.toInt)
      case other => fail(other.toString)
    }
  }

  test("boolean connectives") {
    parse("x > 1 AND (y < 2 OR NOT z = 3)") match {
      case And(Cmp(CmpOp.Gt, Col("x"), _), Or(Cmp(CmpOp.Lt, Col("y"), _), Not(Cmp(CmpOp.Eq, Col("z"), _)))) => ()
      case other => fail(other.toString)
    }
  }

  test("the paper's §3.1 predicate translates losslessly") {
    val p = parse("IF(unit='feet', altit * 0.3048, altit) > 1500 AND name LIKE 'Marked-%-Ridge'")
    p match {
      case And(Cmp(CmpOp.Gt, If(Cmp(CmpOp.Eq, Col("unit"), _), Arith(ArithOp.Mul, Col("altit"), _), Col("altit")), _),
               Like(Col("name"), "Marked-%-Ridge")) => ()
      case other => fail(other.toString)
    }
    assert(!PExpr.hasOpaque(p))
  }

  test("CASE WHEN") {
    parse("CASE WHEN x > 0 THEN 1 ELSE 2 END = 1") match {
      case Cmp(CmpOp.Eq, CaseWhen(Seq((Cmp(CmpOp.Gt, Col("x"), _), Lit(_))), Some(Lit(_))), Lit(_)) => ()
      case other => fail(other.toString)
    }
  }

  test("IN list") {
    assert(parse("s IN ('a','b')") == In(Col("s"), Seq(Scalar.StringV("a"), Scalar.StringV("b"))))
  }

  test("null tests") {
    assert(parse("x IS NULL") == IsNull(Col("x")))
    assert(parse("x IS NOT NULL") == IsNotNull(Col("x")))
  }

  test("arithmetic operators") {
    parse("a + b * 2 - c / 4 > 0") match {
      case Cmp(CmpOp.Gt,
               Arith(ArithOp.Sub,
                     Arith(ArithOp.Add, Col("a"), Arith(ArithOp.Mul, Col("b"), _)),
                     Arith(ArithOp.Div, Col("c"), _)), _) => ()
      case other => fail(other.toString)
    }
  }

  test("unary minus") {
    parse("-x < 5") match {
      case Cmp(CmpOp.Lt, Neg(Col("x")), _) => ()
      case other => fail(other.toString)
    }
  }

  test("startswith/endswith/contains functions") {
    assert(parse("startswith(s, 'Alp')") == StartsWith(Col("s"), "Alp"))
    assert(parse("endswith(s, 'ine')") == EndsWith(Col("s"), "ine"))
    assert(parse("contains(s, 'pin')") == Contains(Col("s"), "pin"))
  }

  test("unknown functions degrade to Opaque, not a crash") {
    val p = parse("my_udf(x) > 1")
    assert(PExpr.hasOpaque(p))
    // …and an Opaque inside an AND still lets the other side prune:
    val q = parse("my_udf(x) > 1 AND y > 10")
    q match {
      case And(l, Cmp(CmpOp.Gt, Col("y"), _)) => assert(PExpr.hasOpaque(l))
      case other => fail(other.toString)
    }
  }

  test("resolved expressions from a real DataFrame plan translate too") {
    import spark.implicits._
    val df = Seq((1L, "a"), (2L, "b")).toDF("x", "s").filter("x > 1 AND s = 'b'")
    val filters = df.queryExecution.analyzed.collect {
      case f: org.apache.spark.sql.catalyst.plans.logical.Filter => f.condition
    }
    assert(filters.nonEmpty)
    val p = CatalystTranslator.translate(filters.head)
    assert(PExpr.columns(p) == Set("x", "s"))
    assert(!PExpr.hasOpaque(p))
  }
}
