package repro.workload

import org.scalatest.funsuite.AnyFunSuite

class QueryClassifierSpec extends AnyFunSuite {

  import QueryClassifier._

  test("plain select") {
    val c = classify("SELECT * FROM t")
    assert(c.isSelect && !c.hasLimit && !c.hasOrderBy && !c.hasPredicate)
  }

  test("limit without predicate") {
    val c = classify("SELECT * FROM t LIMIT 10")
    assert(c.isLimitQuery && !c.hasPredicate && !c.isTopK)
  }

  test("limit with predicate") {
    val c = classify("SELECT * FROM t WHERE v > 5 LIMIT 10")
    assert(c.isLimitQuery && c.hasPredicate)
  }

  test("order by x limit k") {
    val c = classify("SELECT * FROM t ORDER BY v DESC LIMIT 3")
    assert(c.isTopK && c.isTopKPlain && !c.isTopKGroupKey && !c.isTopKGroupAgg)
  }

  test("group by x order by x limit k") {
    val c = classify("SELECT g, count(*) AS cnt FROM t GROUP BY g ORDER BY g DESC LIMIT 5")
    assert(c.isTopK && c.isTopKGroupKey && !c.isTopKGroupAgg)
  }

  test("group by y order by agg limit k — aggregate alias") {
    val c = classify("SELECT g, count(*) AS cnt FROM t GROUP BY g ORDER BY cnt DESC LIMIT 5")
    assert(c.isTopK && c.isTopKGroupAgg && !c.isTopKGroupKey)
  }

  test("group by y order by agg limit k — inline aggregate") {
    val c = classify("SELECT g FROM t GROUP BY g ORDER BY sum(x) DESC LIMIT 5")
    assert(c.isTopK && c.isTopKGroupAgg)
  }

  test("order by without limit is not top-k") {
    val c = classify("SELECT * FROM t ORDER BY v DESC")
    assert(!c.isTopK && !c.isLimitQuery)
  }

  test("case insensitivity") {
    val c = classify("select * from t where v > 1 order by v limit 2")
    assert(c.isTopK && c.hasPredicate)
  }

  test("non-select is excluded from table 1") {
    val t1 = table1(Seq("DELETE FROM t WHERE v > 1", "SELECT * FROM t LIMIT 1"))
    assert(t1.limitQueries == 1.0) // only the SELECT counts
  }

  test("classifier recovers the generated workload mix (Table 1 round trip)") {
    val tables = TableGen.catalog(20, 5)
    val queries = WorkloadGen.generate(tables, 12000, 6)
    val t1 = table1(queries.map(_.sql))
    // Ground truth from generator kinds:
    def frac(k: WorkloadGen.Kind*) = queries.count(q => k.contains(q.kind)).toDouble / queries.size
    assert(math.abs(t1.limitQueries - frac(WorkloadGen.Kind.LimitNoPred, WorkloadGen.Kind.LimitPred)) < 0.002)
    assert(math.abs(t1.topK - frac(WorkloadGen.Kind.TopKOrderBy, WorkloadGen.Kind.TopKGroupKey,
                                   WorkloadGen.Kind.TopKGroupAgg)) < 0.002)
    assert(math.abs(t1.topKGroupAgg - frac(WorkloadGen.Kind.TopKGroupAgg)) < 0.002)
    // And the mix approximates the paper's Table 1.
    assert(math.abs(t1.limitQueries - 0.0260) < 0.006)
    assert(math.abs(t1.topK - 0.0555) < 0.008)
  }
}
