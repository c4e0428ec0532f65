package repro.core

import org.scalatest.funsuite.AnyFunSuite

import repro.meta._
import PExpr._

class PruningTreeSpec extends AnyFunSuite {

  import Scalar._

  private def part(id: Int, lo: Long, hi: Long): PartitionMeta =
    PartitionMeta(id, 100, Map("x" -> ColumnStats(Some(LongV(lo)), Some(LongV(hi)), 0)))

  private val parts = (0 until 200).map(i => part(i, i * 10, i * 10 + 9))

  test("AND tree prunes like the plain conjunction") {
    val p1 = Cmp(CmpOp.Gte, Col("x"), lit(500L))
    val p2 = Cmp(CmpOp.Lt, Col("x"), lit(700L))
    val pruner = new AdaptivePruner(PruningTree.fromPExpr(And(p1, p2)))
    val kept = pruner.run(parts)
    val expected = FilterPruner.classify(parts, And(p1, p2)).scanSet
    assert(kept.map(_.id) == expected.map(_.id))
  }

  test("reordering moves the more selective leaf first under AND") {
    // p_sel prunes almost everything; p_loose prunes nothing.
    val pSel = PruningTree.leaf("sel", Cmp(CmpOp.Gte, Col("x"), lit(1900L)))
    val pLoose = PruningTree.leaf("loose", Cmp(CmpOp.Gte, Col("x"), lit(-1L)))
    val root = PruningTree.and(pLoose, pSel)
    val pruner = new AdaptivePruner(root, PruningTree.Config(reorderEvery = 16,
      cutoffCheckEvery = Int.MaxValue))
    pruner.run(parts)
    val stats = pruner.leafStats
    val sel = stats.find(_.name == "sel").get
    val loose = stats.find(_.name == "loose").get
    // After reordering, "sel" short-circuits the AND, so "loose" is
    // evaluated far less often than "sel".
    assert(sel.evals == parts.size)
    assert(loose.evals < parts.size / 2,
      s"loose evaluated ${loose.evals} times — reordering did not engage")
  }

  test("cutoff deactivates a slow ineffective leaf below AND") {
    val ineffective = new PruningTree.Leaf("slow",
      Cmp(CmpOp.Gte, Col("x"), lit(-1L)), artificialCostNanos = 50_000_000L)
    val effective = PruningTree.leaf("good", Cmp(CmpOp.Gte, Col("x"), lit(1000L)))
    val root = PruningTree.and(ineffective, effective)
    val pruner = new AdaptivePruner(root,
      PruningTree.Config(reorderEvery = Int.MaxValue, cutoffCheckEvery = 40,
                         minSamples = 32, scanCostNanosPerPartition = 2_000_000L))
    pruner.run(parts)
    assert(!ineffective.isActive, "slow ineffective leaf should be cut off")
    val good = pruner.leafStats.find(_.name == "good").get
    assert(good.active)
  }

  test("cutoff never fires below OR (would disable the whole disjunction)") {
    val slow = new PruningTree.Leaf("slow",
      Cmp(CmpOp.Gte, Col("x"), lit(-1L)), artificialCostNanos = 50_000_000L)
    val other = PruningTree.leaf("other", Cmp(CmpOp.Gte, Col("x"), lit(1000L)))
    val root = PruningTree.or(slow, other)
    val pruner = new AdaptivePruner(root,
      PruningTree.Config(cutoffCheckEvery = 40, minSamples = 16))
    pruner.run(parts)
    assert(slow.isActive, "leaves below OR must never be cut off")
  }

  test("a cut-off leaf keeps the scan conservative (no over-pruning)") {
    // The effective leaf is cut off too? No: it prunes plenty. Force-cut the
    // selective leaf and verify everything passes afterwards.
    val l = new PruningTree.Leaf("sel", Cmp(CmpOp.Gte, Col("x"), lit(1900L)),
                                 artificialCostNanos = 500_000_000L)
    val pruner = new AdaptivePruner(PruningTree.and(l),
      PruningTree.Config(cutoffCheckEvery = 10, minSamples = 8,
                         scanCostNanosPerPartition = 1L))
    val kept = pruner.run(parts)
    assert(!l.isActive)
    // Everything after the cutoff point is kept; nothing wrongly pruned:
    val trulyMatching = parts.filter(p => RangeEval.mayMatch(l.pred, p)).map(_.id).toSet
    assert(trulyMatching.subsetOf(kept.map(_.id).toSet))
  }

  test("OR short-circuit: low-selectivity leaf first saves evaluations") {
    val never = PruningTree.leaf("never", Cmp(CmpOp.Gte, Col("x"), lit(-1L))) // always may-match
    val narrow = PruningTree.leaf("narrow", Cmp(CmpOp.Gte, Col("x"), lit(1900L)))
    val root = PruningTree.or(narrow, never)
    val pruner = new AdaptivePruner(root, PruningTree.Config(reorderEvery = 16,
      cutoffCheckEvery = Int.MaxValue))
    pruner.run(parts)
    val neverStat = pruner.leafStats.find(_.name == "never").get
    val narrowStat = pruner.leafStats.find(_.name == "narrow").get
    // "never" (low selectivity = passes everything) should end up first and
    // absorb the evaluations; "narrow" mostly short-circuited away.
    assert(neverStat.evals > narrowStat.evals)
  }

  test("empty partitions are pruned without touching the tree") {
    val empty = PartitionMeta(0, 0, Map.empty)
    val l = new PruningTree.Leaf("l", Cmp(CmpOp.Gte, Col("x"), lit(0L)))
    val pruner = new AdaptivePruner(PruningTree.and(l))
    assert(!pruner.mayMatch(empty))
    assert(l.evalCount == 0)
  }

  test("leaf stats track pruning counts") {
    val l = new PruningTree.Leaf("l", Cmp(CmpOp.Gte, Col("x"), lit(1000L)))
    val pruner = new AdaptivePruner(PruningTree.and(l),
      PruningTree.Config(cutoffCheckEvery = Int.MaxValue))
    pruner.run(parts)
    val s = pruner.leafStats.head
    assert(s.evals == parts.size)
    assert(s.pruned == parts.count(p => !RangeEval.mayMatch(l.pred, p)))
  }
}
