package repro.workload

/** SQL-text pattern matcher reproducing the paper's Table 1 methodology:
  * "based on pattern-matching on SQL texts" — LIMIT / top-k query types are
  * recognized from the text alone, without access to the plan.
  */
object QueryClassifier {

  final case class Classification(
      isSelect: Boolean,
      hasPredicate: Boolean,
      hasLimit: Boolean,
      hasOrderBy: Boolean,
      /** ORDER BY x LIMIT k with no GROUP BY. */
      isTopKPlain: Boolean,
      /** GROUP BY x ORDER BY x LIMIT k (order keys ⊆ group keys). */
      isTopKGroupKey: Boolean,
      /** GROUP BY y ORDER BY agg(x) LIMIT k. */
      isTopKGroupAgg: Boolean) {
    def isLimitQuery: Boolean = hasLimit && !hasOrderBy
    def isTopK: Boolean = hasLimit && hasOrderBy
  }

  private val limitRe   = raw"(?i)\bLIMIT\s+\d+".r
  private val whereRe   = raw"(?i)\bWHERE\b".r
  private val orderByRe = raw"(?i)\bORDER\s+BY\s+(\w+\s*\([^)]*\)|[\w.]+)".r
  private val groupByRe = raw"(?i)\bGROUP\s+BY\s+([\w.]+)".r
  private val selectRe  = raw"(?i)^\s*SELECT\b".r
  private val aggAliasRe = raw"(?i)\b(count|sum|min|max|avg)\s*\([^)]*\)\s+AS\s+(\w+)".r

  def classify(sql: String): Classification = {
    val isSelect = selectRe.findFirstIn(sql).isDefined
    val hasLimit = limitRe.findFirstIn(sql).isDefined
    val hasWhere = whereRe.findFirstIn(sql).isDefined
    val orderCol = orderByRe.findFirstMatchIn(sql).map(_.group(1))
    val groupCol = groupByRe.findFirstMatchIn(sql).map(_.group(1))
    val aggAliases = aggAliasRe.findAllMatchIn(sql).map(_.group(2).toLowerCase).toSet

    val hasOrderBy = orderCol.isDefined
    val orderIsAggregate = orderCol.exists { c =>
      c.contains("(") || aggAliases.contains(c.toLowerCase)
    }
    val topK = hasLimit && hasOrderBy
    val topKGroupAgg = topK && groupCol.isDefined && orderIsAggregate
    val topKGroupKey = topK && groupCol.isDefined && !orderIsAggregate &&
      orderCol.map(_.toLowerCase) == groupCol.map(_.toLowerCase)
    val topKPlain = topK && groupCol.isEmpty

    Classification(isSelect, hasWhere, hasLimit, hasOrderBy,
                   topKPlain, topKGroupKey, topKGroupAgg)
  }

  /** Table 1 rows: relative frequency of each type over a SQL-text corpus. */
  final case class Table1(
      limitQueries: Double, limitNoPred: Double, limitPred: Double,
      topK: Double, topKOrderBy: Double, topKGroupKey: Double, topKGroupAgg: Double)

  def table1(sqls: Seq[String]): Table1 = {
    val cs = sqls.map(classify).filter(_.isSelect)
    val n = cs.size.toDouble.max(1.0)
    Table1(
      limitQueries = cs.count(_.isLimitQuery) / n,
      limitNoPred  = cs.count(c => c.isLimitQuery && !c.hasPredicate) / n,
      limitPred    = cs.count(c => c.isLimitQuery && c.hasPredicate) / n,
      topK         = cs.count(_.isTopK) / n,
      topKOrderBy  = cs.count(_.isTopKPlain) / n,
      topKGroupKey = cs.count(_.isTopKGroupKey) / n,
      topKGroupAgg = cs.count(_.isTopKGroupAgg) / n)
  }
}
