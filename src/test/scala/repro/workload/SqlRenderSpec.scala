package repro.workload

import repro.SparkSpec
import repro.core.{CatalystTranslator, PExpr}
import repro.core.PExpr._
import repro.meta.{PartitionMeta, ColumnStats, Scalar}

/** Rendered SQL must parse back (via Spark's parser + the Catalyst
  * translator) into a predicate with identical pruning behaviour — closing
  * the loop between the generator, the SQL text, and the pruning library.
  */
class SqlRenderSpec extends SparkSpec {

  private def roundTrip(p: PExpr): PExpr =
    CatalystTranslator.translate(
      spark.sessionState.sqlParser.parseExpression(SqlRender.renderExpr(p)))

  private val samples: Seq[PExpr] = {
    val rnd = new scala.util.Random(3)
    (0 until 40).map(_ => WorkloadGen.samplePredicate(rnd))
  }

  test("rendered predicates parse and translate back") {
    samples.foreach { p =>
      val back = roundTrip(p)
      assert(!PExpr.hasOpaque(back), s"round trip lost precision: $p → $back")
      assert(PExpr.columns(back) == PExpr.columns(p))
    }
  }

  test("round-tripped predicates make identical pruning decisions") {
    import Scalar._
    val metas = (0 until 50).map { i =>
      PartitionMeta(i, 100, Map(
        "v" -> ColumnStats(Some(LongV(i * 20000L)), Some(LongV(i * 20000L + 19999)), 0),
        "s" -> ColumnStats(Some(StringV("alpha")), Some(StringV("hotel")), 0),
        "dt" -> ColumnStats(Some(DateV(9131 + i * 50)), Some(DateV(9131 + i * 50 + 49)), 0)))
    }
    samples.foreach { p =>
      val back = roundTrip(p)
      metas.foreach { m =>
        assert(repro.core.RangeEval.mayMatch(p, m) == repro.core.RangeEval.mayMatch(back, m),
          s"pruning divergence for $p on $m")
      }
    }
  }

  test("full query rendering includes all clauses") {
    val spec = repro.sim.QuerySpec(1, "t", Some(Cmp(CmpOp.Gt, Col("v"), lit(5L))),
      groupBy = Some("g"), orderBy = Some(repro.sim.OrderBy("g", desc = true)),
      limit = Some(7))
    val sql = SqlRender.render(spec)
    assert(sql.contains("WHERE"))
    assert(sql.contains("GROUP BY g"))
    assert(sql.contains("ORDER BY g DESC"))
    assert(sql.contains("LIMIT 7"))
  }

  test("join rendering") {
    val spec = repro.sim.QuerySpec(1, "probe", None,
      join = Some(repro.sim.JoinSpec("build", "v", "v",
        Some(Cmp(CmpOp.Lt, Col("v"), lit(10L))))))
    val sql = SqlRender.render(spec)
    assert(sql.contains("JOIN build ON probe.v = build.v"))
  }

  test("string literals are escaped") {
    assert(SqlRender.renderExpr(Cmp(CmpOp.Eq, Col("s"), lit("O'Brien"))) ==
      "s = 'O''Brien'")
  }
}
