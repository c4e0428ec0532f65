package repro.core

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.Gen

import repro.PropHelper.forAllSeeded
import repro.meta._
import PExpr._

/** The contract every pruner relies on (§2.1): metadata evaluation may
  * produce false positives but NEVER false negatives —
  *
  *  - a partition classified NotMatching contains no qualifying row;
  *  - a partition classified FullyMatching contains only qualifying rows.
  *
  * Verified against exact row-level evaluation over randomly generated data
  * and randomly generated predicate trees.
  */
class PruningSoundnessSpec extends AnyFunSuite {

  import Scalar._

  private val vocab = Vector("alpha", "bravo", "charlie", "delta", "echo", "foxtrot")

  private type Row = Map[String, Scalar] // value null = SQL NULL

  private val genRow: Gen[Row] = for {
    x <- Gen.chooseNum(-50L, 50L)
    xNull <- Gen.prob(0.1)
    d <- Gen.chooseNum(-100, 100).map(_ / 4.0)
    s <- Gen.oneOf(vocab)
    sNull <- Gen.prob(0.1)
  } yield Map(
    "x" -> (if (xNull) null else LongV(x)),
    "d" -> DoubleV(d),
    "s" -> (if (sNull) null else StringV(s)))

  private val genPartition: Gen[Vector[Row]] =
    Gen.chooseNum(0, 12).flatMap(n => Gen.listOfN(n, genRow).map(_.toVector))

  private def genLeaf: Gen[PExpr] = Gen.oneOf(
    Gen.chooseNum(-60L, 60L).flatMap(v =>
      Gen.oneOf(CmpOp.Lt, CmpOp.Lte, CmpOp.Gt, CmpOp.Gte, CmpOp.Eq, CmpOp.Neq)
        .map(op => Cmp(op, Col("x"), lit(v)): PExpr)),
    Gen.chooseNum(-30, 30).map(v => Cmp(CmpOp.Gt, Col("d"), lit(v / 2.0)): PExpr),
    Gen.oneOf(vocab).map(s => Cmp(CmpOp.Eq, Col("s"), lit(s)): PExpr),
    Gen.oneOf(vocab).map(s => Like(Col("s"), s.take(2) + "%"): PExpr),
    Gen.oneOf(vocab).map(s => Like(Col("s"), "%" + s.drop(3)): PExpr),
    Gen.someOf(vocab).map(ss => In(Col("s"), ss.map(StringV(_)).toSeq): PExpr),
    Gen.const(IsNull(Col("x")): PExpr),
    Gen.const(IsNotNull(Col("s")): PExpr),
    // Arithmetic over two columns, compared to a constant.
    Gen.chooseNum(-80L, 80L).map(v =>
      Cmp(CmpOp.Gt, Arith(ArithOp.Add, Col("x"), Col("d")), lit(v)): PExpr),
    // Conditional expression in the §3.1 style.
    Gen.chooseNum(-40L, 40L).map(v =>
      Cmp(CmpOp.Lt,
          If(Cmp(CmpOp.Eq, Col("s"), lit("alpha")),
             Arith(ArithOp.Mul, Col("x"), lit(2L)), Col("x")),
          lit(v)): PExpr))

  private def genPred(depth: Int): Gen[PExpr] =
    if (depth <= 0) genLeaf
    else Gen.frequency(
      4 -> genLeaf,
      2 -> Gen.lzy(for { a <- genPred(depth - 1); b <- genPred(depth - 1) } yield And(a, b)),
      2 -> Gen.lzy(for { a <- genPred(depth - 1); b <- genPred(depth - 1) } yield Or(a, b)),
      1 -> Gen.lzy(genPred(depth - 1).map(Not(_))))

  private val genCase: Gen[(Vector[Vector[Row]], PExpr)] = for {
    parts <- Gen.listOfN(4, genPartition).map(_.toVector)
    pred <- genPred(3)
  } yield (parts, pred)

  private def metaOf(id: Int, rows: Vector[Row]): PartitionMeta = {
    val cols = Seq("x", "d", "s").map { c =>
      c -> ColumnStats.ofValues(rows.map(r => r(c) match {
        case null              => null
        case LongV(v)          => v
        case DoubleV(v)        => v
        case StringV(v)        => v
        case other             => throw new IllegalStateException(other.toString)
      }))
    }.toMap
    PartitionMeta(id, rows.size.toLong, cols)
  }

  private def lookup(row: Row): PExprEval.RowLookup = name => row.get(name).flatMap(Option(_))

  test("property: NotMatching partitions contain no qualifying row") {
    forAllSeeded(genCase, n = 400) { case (parts, pred) =>
      val metas = parts.zipWithIndex.map { case (rows, i) => metaOf(i, rows) }
      val classified = FilterPruner.classify(metas, pred)
      classified.partitions.foreach { cp =>
        val rows = parts(cp.meta.id)
        val matching = rows.count(r => PExprEval.passes(pred, lookup(r)))
        cp.cls match {
          case MatchClass.NotMatching =>
            assert(matching == 0,
              s"false negative! pred=$pred meta=${cp.meta} had $matching matching rows")
          case MatchClass.FullyMatching =>
            assert(matching == rows.size,
              s"bogus fully-matching! pred=$pred meta=${cp.meta}: $matching/${rows.size}")
          case MatchClass.PartiallyMatching => ()
        }
      }
    }
  }

  test("property: inverted-pass (IS NOT TRUE) certification is sound") {
    forAllSeeded(genCase, n = 200) { case (parts, pred) =>
      val metas = parts.zipWithIndex.map { case (rows, i) => metaOf(i, rows) }
      metas.filter(_.rowCount > 0).foreach { m =>
        val inverted = Rewrites.invert(pred)
        val viaInversion = RangeEval.mayMatch(pred, m) && !RangeEval.mayMatch(inverted, m)
        if (viaInversion) {
          val rows = parts(m.id)
          assert(rows.forall(r => PExprEval.passes(pred, lookup(r))))
        }
      }
    }
  }

  test("property: plain NOT must never be used for certification over nullable data") {
    // Regression guard for the NULL-semantics bug: `x IS NOT TRUE` differs
    // from `NOT x` exactly on NULL rows.
    forAllSeeded(genRow, n = 100) { row =>
      forAllSeeded(genPred(2), n = 10) { pred =>
        val l = lookup(row)
        val p = PExprEval.evalPred(pred, l)
        assert(PExprEval.passes(IsNotTrue(pred), l) == !p.contains(true))
        assert(PExprEval.evalPred(Not(pred), l) == p.map(!_))
      }
    }
  }

  test("property: adaptive pruning tree never over-prunes vs plain evaluation") {
    forAllSeeded(genCase, n = 100) { case (parts, pred) =>
      val metas = parts.zipWithIndex.map { case (rows, i) => metaOf(i, rows) }
      val pruner = new AdaptivePruner(PruningTree.fromPExpr(pred))
      metas.foreach { m =>
        val kept = pruner.mayMatch(m)
        val rows = parts(m.id)
        val matching = rows.count(r => PExprEval.passes(pred, lookup(r)))
        if (!kept) assert(matching == 0, s"tree over-pruned: pred=$pred meta=$m")
      }
    }
  }
}
