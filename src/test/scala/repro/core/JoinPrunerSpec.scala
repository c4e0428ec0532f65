package repro.core

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.Gen

import repro.PropHelper.forAllSeeded
import repro.meta._
import JoinPruner._

class JoinPrunerSpec extends AnyFunSuite {

  import Scalar._

  private def part(id: Int, lo: Long, hi: Long): PartitionMeta =
    PartitionMeta(id, 100, Map("k" -> ColumnStats(Some(LongV(lo)), Some(LongV(hi)), 0)))

  test("empty build side prunes every probe partition") {
    val s = summarize(Seq.empty)
    assert(s == EmptySummary)
    val r = pruneProbe((0 until 10).map(i => part(i, i * 10, i * 10 + 9)), "k", s)
    assert(r.scanSet.isEmpty)
    assert(r.pruningRatio == 1.0)
  }

  test("min/max summary prunes outside the global range") {
    val s = summarize(Seq(LongV(100), LongV(200)), maxRanges = 1)
    assert(s.isInstanceOf[MinMaxSummary])
    assert(!s.mayOverlap(ValueRange(LongV(0), LongV(99))))
    assert(s.mayOverlap(ValueRange(LongV(150), LongV(160))))
    assert(s.mayOverlap(ValueRange(LongV(199), LongV(300))))
  }

  test("range-set summary prunes gaps the min/max summary cannot") {
    // Two clusters: 0..9 and 1000..1009 — the gap should be preserved.
    val vals = ((0L to 9L) ++ (1000L to 1009L)).map(LongV(_))
    val s = summarize(vals, maxRanges = 2)
    assert(s.isInstanceOf[RangeSetSummary])
    assert(!s.mayOverlap(ValueRange(LongV(100), LongV(900))))
    assert(s.mayOverlap(ValueRange(LongV(5), LongV(7))))
    assert(s.mayOverlap(ValueRange(LongV(1005), LongV(2000))))
    // The single-range summary would keep the gap partition.
    val s1 = summarize(vals, maxRanges = 1)
    assert(s1.mayOverlap(ValueRange(LongV(100), LongV(900))))
  }

  test("exact set summary answers point ranges precisely") {
    val s = summarize(Seq(10L, 20L, 30L).map(LongV(_)), maxRanges = Int.MaxValue)
    assert(s.isInstanceOf[ExactSetSummary])
    assert(s.mayOverlap(ValueRange(LongV(20), LongV(20))))
    assert(!s.mayOverlap(ValueRange(LongV(11), LongV(19))))
    assert(!s.mayOverlap(ValueRange(LongV(31), LongV(100))))
    assert(s.mayOverlap(ValueRange(LongV(0), LongV(10))))
  }

  test("summary size grows with budget, precision with it") {
    val vals = (0 until 500).map(i => LongV(i * 7L))
    val small = summarize(vals, maxRanges = 4)
    val large = summarize(vals, maxRanges = 64)
    assert(small.sizeBytes < large.sizeBytes)
  }

  test("all-null probe partitions are pruned (NULL never joins)") {
    val nullPart = PartitionMeta(0, 10, Map("k" -> ColumnStats(None, None, 10)))
    val r = pruneProbe(Seq(nullPart), "k", summarize(Seq(LongV(1))))
    assert(r.scanSet.isEmpty)
  }

  test("missing stats keep the partition (no false negatives)") {
    val noStats = PartitionMeta(0, 10, Map.empty)
    val r = pruneProbe(Seq(noStats), "k", summarize(Seq(LongV(1))))
    assert(r.scanSet.size == 1)
  }

  test("string join keys work end to end") {
    val s = summarize(Seq("alpha", "echo").map(StringV(_)), maxRanges = Int.MaxValue)
    val m1 = PartitionMeta(0, 5, Map("k" -> ColumnStats(Some(StringV("bravo")), Some(StringV("delta")), 0)))
    val m2 = PartitionMeta(1, 5, Map("k" -> ColumnStats(Some(StringV("delta")), Some(StringV("foxtrot")), 0)))
    val r = pruneProbe(Seq(m1, m2), "k", s)
    assert(r.scanSet.map(_.id) == Seq(1))
  }

  private val genCase: Gen[(Vector[Long], Vector[(Long, Long)], Int)] = for {
    build <- Gen.listOf(Gen.chooseNum(0L, 500L)).map(_.toVector)
    nProbe <- Gen.chooseNum(1, 20)
    probe <- Gen.listOfN(nProbe, for {
      a <- Gen.chooseNum(0L, 500L); w <- Gen.chooseNum(0L, 60L)
    } yield (a, a + w)).map(_.toVector)
    budget <- Gen.oneOf(1, 2, 4, 8, Int.MaxValue)
  } yield (build, probe, budget)

  test("property: join pruning never prunes a partition containing a build value") {
    forAllSeeded(genCase, n = 300) { case (build, probeRanges, budget) =>
      val summary = summarize(build.map(LongV(_)), budget)
      val parts = probeRanges.zipWithIndex.map { case ((lo, hi), i) => part(i, lo, hi) }
      val r = pruneProbe(parts, "k", summary)
      val keptIds = r.scanSet.map(_.id).toSet
      probeRanges.zipWithIndex.foreach { case ((lo, hi), i) =>
        val joinable = build.exists(v => v >= lo && v <= hi)
        if (joinable) assert(keptIds.contains(i),
          s"pruned a joinable partition [$lo,$hi] build=$build budget=$budget")
      }
    }
  }

  test("property: exact summary prunes every non-joinable partition") {
    forAllSeeded(genCase, n = 200) { case (build, probeRanges, _) =>
      val summary = summarize(build.map(LongV(_)), Int.MaxValue)
      val parts = probeRanges.zipWithIndex.map { case ((lo, hi), i) => part(i, lo, hi) }
      val r = pruneProbe(parts, "k", summary)
      val keptIds = r.scanSet.map(_.id).toSet
      probeRanges.zipWithIndex.foreach { case ((lo, hi), i) =>
        val joinable = build.exists(v => v >= lo && v <= hi)
        assert(keptIds.contains(i) == joinable)
      }
    }
  }
}
