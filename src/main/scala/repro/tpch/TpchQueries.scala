package repro.tpch

import repro.core.PExpr
import repro.core.PExpr._

/** Pruning-relevant predicate sets of the TPC-H queries, restricted to the
  * TPC-H-lite schema (lineitem / orders / customer / part from
  * [[repro.SynthData]]).
  *
  * §8.3 measures how much of each query's scan work filter pruning removes
  * when the data is clustered on `l_shipdate` / `o_orderdate`; only the
  * scans and predicates matter for that, so each query is modelled as its
  * set of table scans with the (possibly absent) pruning-relevant predicate.
  * Predicates on columns the lite schema lacks (receiptdate, comments,
  * brand/container, nation/region keys) are modelled as [[PExpr.Opaque]] —
  * present but non-prunable, exactly how an engine treats them. Q11 is
  * omitted (it touches only partsupp/supplier, absent from the lite schema).
  */
object TpchQueries {

  final case class ScanPred(table: String, pred: Option[PExpr])
  final case class Query(name: String, scans: Seq[ScanPred])

  private def d(iso: String): PExpr = dateLit(java.time.LocalDate.parse(iso).toEpochDay.toInt)
  private def between(col: String, lo: PExpr, hi: PExpr): PExpr =
    And(Cmp(CmpOp.Gte, Col(col), lo), Cmp(CmpOp.Lt, Col(col), hi))

  private val opaque: Option[PExpr] = Some(Opaque("predicate on column absent from lite schema"))

  val queries: Seq[Query] = Seq(
    Query("Q1", Seq(ScanPred("lineitem",
      Some(Cmp(CmpOp.Lte, Col("l_shipdate"), d("1998-09-02")))))),
    Query("Q2", Seq(ScanPred("part",
      Some(Cmp(CmpOp.Eq, Col("p_size"), lit(15L)))))),
    Query("Q3", Seq(
      ScanPred("customer", Some(Cmp(CmpOp.Eq, Col("c_mktsegment"), lit("BUILDING")))),
      ScanPred("orders", Some(Cmp(CmpOp.Lt, Col("o_orderdate"), d("1995-03-15")))),
      ScanPred("lineitem", Some(Cmp(CmpOp.Gt, Col("l_shipdate"), d("1995-03-15")))))),
    Query("Q4", Seq(
      ScanPred("orders", Some(between("o_orderdate", d("1993-07-01"), d("1993-10-01")))),
      ScanPred("lineitem", opaque))), // l_commitdate < l_receiptdate
    Query("Q5", Seq(
      ScanPred("customer", None),
      ScanPred("orders", Some(between("o_orderdate", d("1994-01-01"), d("1995-01-01")))),
      ScanPred("lineitem", None))),
    Query("Q6", Seq(ScanPred("lineitem", Some(PExpr.and(Seq(
      between("l_shipdate", d("1994-01-01"), d("1995-01-01")),
      between("l_discount", lit(0.05), lit(0.08)),
      Cmp(CmpOp.Lt, Col("l_quantity"), lit(24L)))))))),
    Query("Q7", Seq(
      ScanPred("customer", None),
      ScanPred("orders", None),
      ScanPred("lineitem", Some(between("l_shipdate", d("1995-01-01"), d("1997-01-01")))))),
    Query("Q8", Seq(
      ScanPred("part", Some(Cmp(CmpOp.Eq, Col("p_type"), lit("ECONOMY")))),
      ScanPred("orders", Some(between("o_orderdate", d("1995-01-01"), d("1997-01-01")))),
      ScanPred("lineitem", None),
      ScanPred("customer", None))),
    Query("Q9", Seq(
      ScanPred("part", Some(Contains(Col("p_type"), "MED"))), // %green% analogue
      ScanPred("lineitem", None),
      ScanPred("orders", None))),
    Query("Q10", Seq(
      ScanPred("customer", None),
      ScanPred("orders", Some(between("o_orderdate", d("1993-10-01"), d("1994-01-01")))),
      ScanPred("lineitem", Some(Cmp(CmpOp.Eq, Col("l_returnflag"), lit("R")))))),
    Query("Q12", Seq(
      ScanPred("orders", None),
      // Paper's l_receiptdate range; the lite schema substitutes l_shipdate.
      ScanPred("lineitem", Some(between("l_shipdate", d("1994-01-01"), d("1995-01-01")))))),
    Query("Q13", Seq(
      ScanPred("customer", None),
      ScanPred("orders", opaque))), // o_comment NOT LIKE '%special%requests%'
    Query("Q14", Seq(
      ScanPred("lineitem", Some(between("l_shipdate", d("1995-09-01"), d("1995-10-01")))),
      ScanPred("part", None))),
    Query("Q15", Seq(
      ScanPred("lineitem", Some(between("l_shipdate", d("1996-01-01"), d("1996-04-01")))))),
    Query("Q16", Seq(
      ScanPred("part", Some(In(Col("p_size"), Seq(1L, 14L, 23L, 45L, 19L, 3L, 36L, 9L)
        .map(repro.meta.Scalar.LongV(_))))))),
    Query("Q17", Seq(
      ScanPred("lineitem", None),
      ScanPred("part", Some(Cmp(CmpOp.Eq, Col("p_size"), lit(1L)))))), // brand/container analogue
    Query("Q18", Seq(
      ScanPred("customer", None),
      ScanPred("orders", None),
      ScanPred("lineitem", None))), // HAVING sum(l_quantity) > 300: not prunable
    Query("Q19", Seq(
      ScanPred("lineitem", Some(Or(
        between("l_quantity", lit(1L), lit(12L)),
        Or(between("l_quantity", lit(10L), lit(21L)),
           between("l_quantity", lit(20L), lit(31L)))))),
      ScanPred("part", Some(Cmp(CmpOp.Lte, Col("p_size"), lit(15L)))))),
    Query("Q20", Seq(
      ScanPred("lineitem", Some(between("l_shipdate", d("1994-01-01"), d("1995-01-01")))),
      ScanPred("part", Some(StartsWith(Col("p_type"), "PRO"))))), // forest% analogue
    Query("Q21", Seq(
      ScanPred("orders", Some(Cmp(CmpOp.Eq, Col("o_orderstatus"), lit("F")))),
      ScanPred("lineitem", opaque))), // l_receiptdate > l_commitdate
    Query("Q22", Seq(
      ScanPred("customer", Some(Cmp(CmpOp.Gt, Col("c_acctbal"), lit(0.0)))),
      ScanPred("orders", None))))
}
