package repro.core

import org.scalatest.funsuite.AnyFunSuite

import repro.meta._
import PExpr._
import LimitPruner.LimitOutcome

class LimitPrunerSpec extends AnyFunSuite {

  import Scalar._

  private def part(id: Int, rows: Long, lo: Long, hi: Long, nulls: Long = 0): PartitionMeta =
    PartitionMeta(id, rows, Map("x" -> ColumnStats(Some(LongV(lo)), Some(LongV(hi)), nulls)))

  // Mirrors Figure 5: four partitions; pred prunes #1, #3 is fully matching.
  private val figure5 = Seq(
    part(0, 4, 100, 200),  // not matching  (x >= 50 holds but species doesn't — model via x)
    part(1, 4, 10, 60),    // partially matching
    part(2, 4, 50, 90),    // fully matching for x >= 50
    part(3, 4, 40, 80))    // partially matching

  private val pred = Cmp(CmpOp.Gte, Col("x"), lit(50L))
  private val predWithUpper = And(pred, Cmp(CmpOp.Lt, Col("x"), lit(95L)))

  test("figure 5 classification: one pruned, one fully matching") {
    val c = FilterPruner.classify(figure5, predWithUpper)
    assert(c.partitions(0).cls == MatchClass.NotMatching)
    assert(c.partitions(1).cls == MatchClass.PartiallyMatching)
    assert(c.partitions(2).cls == MatchClass.FullyMatching)
    assert(c.partitions(3).cls == MatchClass.PartiallyMatching)
  }

  test("figure 5: LIMIT 3 prunes to the single fully-matching partition") {
    val c = FilterPruner.classify(figure5, predWithUpper)
    val r = LimitPruner.prune(c, 3, shapeSupported = true)
    assert(r.outcome == LimitOutcome.Pruned(1))
    assert(r.scanSet.map(_.id) == Seq(2))
  }

  test("LIMIT exceeding fully-matching coverage is unsupported") {
    val c = FilterPruner.classify(figure5, predWithUpper)
    val r = LimitPruner.prune(c, 5, shapeSupported = true)
    assert(r.outcome == LimitOutcome.Unsupported(shapeBlocked = false))
    assert(r.scanSet.size == 3) // falls back to the filter-pruned scan set
  }

  test("blocked shapes never prune") {
    val c = FilterPruner.classify(figure5, predWithUpper)
    val r = LimitPruner.prune(c, 1, shapeSupported = false)
    assert(r.outcome == LimitOutcome.Unsupported(shapeBlocked = true))
  }

  test("scan set of one partition is already minimal") {
    val c = FilterPruner.classify(Seq(part(0, 10, 0, 9)), pred)
    val r = LimitPruner.prune(c, 3, shapeSupported = true)
    assert(r.outcome == LimitOutcome.AlreadyMinimal)
  }

  test("no predicate: all partitions fully matching, minimal cover chosen") {
    val parts = Seq(part(0, 10, 0, 9), part(1, 30, 10, 19), part(2, 20, 20, 29))
    val c = FilterPruner.noPredicate(parts)
    assert(c.fullyMatching.size == 3)
    val r = LimitPruner.prune(c, 40, shapeSupported = true)
    // Greedy: 30-row partition + 20-row partition ≥ 40 → 2 partitions.
    assert(r.outcome == LimitOutcome.Pruned(2))
    assert(r.scanSet.map(_.id).toSet == Set(1, 2))
  }

  test("large k spanning several partitions stays optimal (> 1 bucket)") {
    val parts = (0 until 10).map(i => part(i, 100, i * 100, i * 100 + 99))
    val c = FilterPruner.noPredicate(parts)
    val r = LimitPruner.prune(c, 350, shapeSupported = true)
    assert(r.outcome == LimitOutcome.Pruned(4))
  }

  test("k = 0 prunes to zero partitions") {
    val parts = (0 until 5).map(i => part(i, 100, 0, 9))
    val r = LimitPruner.prune(FilterPruner.noPredicate(parts), 0, shapeSupported = true)
    assert(r.outcome == LimitOutcome.Pruned(0))
    assert(r.scanSet.isEmpty)
  }

  test("partitions with order-column nulls can still cover a plain LIMIT") {
    val parts = Seq(part(0, 10, 0, 9, nulls = 5), part(1, 10, 10, 19))
    val c = FilterPruner.noPredicate(parts)
    val r = LimitPruner.prune(c, 15, shapeSupported = true)
    assert(r.outcome == LimitOutcome.Pruned(2))
  }

  test("Table 2 bucket labels") {
    assert(LimitPruner.bucket(LimitOutcome.AlreadyMinimal) == "already minimal scan set")
    assert(LimitPruner.bucket(LimitOutcome.Unsupported(true)) == "unsupported shapes")
    assert(LimitPruner.bucket(LimitOutcome.Unsupported(false)) == "unsupported shapes")
    assert(LimitPruner.bucket(LimitOutcome.Pruned(1)) == "pruning to = 1 partition")
    assert(LimitPruner.bucket(LimitOutcome.Pruned(0)) == "pruning to = 1 partition")
    assert(LimitPruner.bucket(LimitOutcome.Pruned(4)) == "pruning to > 1 partitions")
  }

  test("fully-matching requires null-free columns under comparison") {
    // Partition range satisfies x >= 50 entirely, but nulls fail the predicate.
    val withNulls = part(0, 10, 50, 90, nulls = 2)
    val c = FilterPruner.classify(Seq(withNulls, part(1, 10, 50, 90)), pred)
    assert(c.partitions(0).cls == MatchClass.PartiallyMatching)
    assert(c.partitions(1).cls == MatchClass.FullyMatching)
  }
}
