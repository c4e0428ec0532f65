package repro.tpch

import repro.SparkSpec
import repro.core.PExpr

class TpchPruningSpec extends SparkSpec {

  test("query set covers 21 of 22 queries (Q11 needs absent tables)") {
    assert(TpchQueries.queries.size == 21)
    assert(!TpchQueries.queries.exists(_.name == "Q11"))
  }

  test("every scan references a lite-schema table") {
    val tables = Set("lineitem", "orders", "customer", "part")
    TpchQueries.queries.foreach(q =>
      q.scans.foreach(s => assert(tables.contains(s.table), s"${q.name}: ${s.table}")))
  }

  test("predicates reference only columns of their table") {
    val cols = Map(
      "lineitem" -> Set("l_orderkey", "l_partkey", "l_linenumber", "l_quantity",
                        "l_extendedprice", "l_discount", "l_tax", "l_returnflag",
                        "l_linestatus", "l_shipdate"),
      "orders"   -> Set("o_orderkey", "o_custkey", "o_orderstatus", "o_totalprice", "o_orderdate"),
      "customer" -> Set("c_custkey", "c_nationkey", "c_acctbal", "c_mktsegment"),
      "part"     -> Set("p_partkey", "p_type", "p_size", "p_retailprice"))
    TpchQueries.queries.foreach { q =>
      q.scans.foreach { s =>
        s.pred.foreach { p =>
          assert(PExpr.columns(p).subsetOf(cols(s.table)),
            s"${q.name} on ${s.table}: ${PExpr.columns(p)}")
        }
      }
    }
  }

  private lazy val tables = TpchPruning.buildTables(spark, sf = 0.02)

  test("clustered layout: selective date ranges prune, opaque predicates don't") {
    val r = TpchPruning.run(tables)
    val byName = r.perQuery.map(q => q.name -> q).toMap
    // Q6 (1-year shipdate range + more) prunes most of lineitem.
    assert(byName("Q6").ratio > 0.5, byName("Q6").toString)
    // Q18 has no prunable predicate at all.
    assert(byName("Q18").ratio == 0.0)
    // Q4's orders 3-month range prunes a large share of orders partitions.
    assert(byName("Q4").pruned > 0)
  }

  test("overall shape matches §8.3: low average, lower median") {
    val r = TpchPruning.run(tables)
    assert(r.average > 0.05 && r.average < 0.60,
      f"average ${r.average}%.3f out of plausible band")
    assert(r.medianPerQuery <= r.average,
      "per-query median should sit below the workload average (skew)")
  }

  test("pruning is deterministic for a fixed build") {
    val a = TpchPruning.run(tables)
    val b = TpchPruning.run(tables)
    assert(a == b)
  }
}
