package repro.workload

import org.scalatest.funsuite.AnyFunSuite

class WorkloadGenSpec extends AnyFunSuite {

  private val rnd = new scala.util.Random(1)

  test("k distribution matches Figure 6's CDF anchors") {
    val ks = (0 until 50000).map(_ => WorkloadGen.sampleK(rnd, allowZero = true))
    val n = ks.size.toDouble
    assert(ks.count(_ <= 1) / n > 0.5, "k=0 and k=1 dominate")
    assert(ks.count(_ <= 10000) / n > 0.95 && ks.count(_ <= 10000) / n < 0.99,
      "97% of queries have k <= 10,000")
    assert(ks.count(_ <= 2000000) / n >= 0.995, "~99.9% have k <= 2,000,000")
  }

  test("allowZero=false never yields 0") {
    assert((0 until 2000).forall(_ => WorkloadGen.sampleK(rnd, allowZero = false) > 0))
  }

  test("generation is deterministic in the seed") {
    val tables = TableGen.catalog(10, 3)
    val a = WorkloadGen.generate(tables, 500, 9)
    val b = WorkloadGen.generate(tables, 500, 9)
    assert(a.map(_.sql) == b.map(_.sql))
    assert(a.map(_.kind) == b.map(_.kind))
  }

  test("different seeds change the workload") {
    val tables = TableGen.catalog(10, 3)
    val a = WorkloadGen.generate(tables, 500, 9)
    val b = WorkloadGen.generate(tables, 500, 10)
    assert(a.map(_.sql) != b.map(_.sql))
  }

  test("limit queries never carry ORDER BY; top-k always does") {
    val tables = TableGen.catalog(10, 3)
    val qs = WorkloadGen.generate(tables, 5000, 4)
    qs.foreach { q =>
      q.kind match {
        case WorkloadGen.Kind.LimitNoPred | WorkloadGen.Kind.LimitPred =>
          assert(q.spec.limit.isDefined && q.spec.orderBy.isEmpty)
        case WorkloadGen.Kind.TopKOrderBy | WorkloadGen.Kind.TopKGroupKey |
             WorkloadGen.Kind.TopKGroupAgg =>
          assert(q.spec.limit.isDefined && q.spec.orderBy.isDefined)
        case _ => ()
      }
    }
  }

  test("every generated spec references tables in the catalog") {
    val tables = TableGen.catalog(10, 3)
    val names = tables.map(_.name).toSet
    val qs = WorkloadGen.generate(tables, 2000, 4)
    qs.foreach { q =>
      assert(names.contains(q.spec.table))
      q.spec.join.foreach(j => assert(names.contains(j.buildTable)))
    }
  }

  test("join empty-build share is near 13%") {
    val preds = (0 until 20000).map(_ => WorkloadGen.sampleBuildPred(rnd, None))
    val empties = preds.count {
      case Some(repro.core.PExpr.Cmp(repro.core.PExpr.CmpOp.Lt, _, repro.core.PExpr.Lit(repro.meta.Scalar.LongV(-1)))) => true
      case _ => false
    }
    assert(math.abs(empties / 20000.0 - 0.13) < 0.01)
  }

  test("table catalog sizes are dominated by small tables") {
    val tables = TableGen.catalog(200, 11)
    val single = tables.count(_.numPartitions == 1)
    assert(single > 60 && single < 120)
    assert(tables.exists(_.numPartitions > 100), "needs a large-table tier")
  }
}
