package repro.sim

import repro.core.PExpr

/** ORDER BY clause of a top-k query. `aggregated` marks `ORDER BY agg(x)`
  * (Table 1's third top-k subtype) — top-k pruning does not support it
  * unless the order keys are a subset of the GROUP BY keys (§5.2).
  */
final case class OrderBy(col: String, desc: Boolean = true, aggregated: Boolean = false)

/** Hash join: `table` is the probe side, `buildTable` the build side.
  * `leftOuterProbeSide` marks a LEFT OUTER JOIN preserving the probe side
  * (probe rows always survive), which legalizes LIMIT pushdown through the
  * join per §4.3.
  */
final case class JoinSpec(
    buildTable: String,
    buildKey: String,
    probeKey: String,
    buildPred: Option[PExpr] = None,
    leftOuterProbeSide: Boolean = false)

/** The simulator's query model — the fragment of SQL the paper's pruning
  * techniques apply to. One main (probe) table scan, an optional hash join
  * against a build side, optional single-column GROUP BY, ORDER BY, LIMIT.
  */
final case class QuerySpec(
    id: Long,
    table: String,
    pred: Option[PExpr] = None,
    join: Option[JoinSpec] = None,
    groupBy: Option[String] = None,
    orderBy: Option[OrderBy] = None,
    limit: Option[Long] = None,
    /** §4.3 — whether the LIMIT reaches the main table scan (no blocking
      * row-reducing operators in between). The workload generator sets this
      * from the (unmodelled) full query shape.
      */
    limitShapeSupported: Boolean = true) {

  def isTopK: Boolean     = orderBy.isDefined && limit.isDefined
  def isLimitOnly: Boolean = limit.isDefined && orderBy.isEmpty
  def hasPredicate: Boolean = pred.isDefined

  /** Top-k pruning applies only to supported plan shapes (Figure 7). */
  def topKSupported: Boolean = orderBy match {
    case Some(ob) if limit.isDefined =>
      if (ob.aggregated) false                       // ORDER BY agg(x): unsupported
      else groupBy.forall(_ == ob.col)               // 7d: order keys ⊆ group keys
    case _ => false
  }
}
