package repro.core

import org.scalatest.funsuite.AnyFunSuite

class StatsSpec extends AnyFunSuite {

  private val numeric = ColumnStats(10.0, 20.0, None)
  private val cat = ColumnStats(1.0, 7.0, Some(Set(1.0, 3.0, 7.0)))

  // --- RangePred vs numeric stats ---
  test("range disjoint below min is skipped") {
    assert(numeric.canSkip(RangePred("c", 0, 9.9)))
  }
  test("range disjoint above max is skipped") {
    assert(numeric.canSkip(RangePred("c", 20.1, 30)))
  }
  test("range overlapping is not skipped") {
    assert(!numeric.canSkip(RangePred("c", 15, 25)))
  }
  test("range touching min boundary is not skipped") {
    assert(!numeric.canSkip(RangePred("c", 0, 10.0)))
  }
  test("range touching max boundary is not skipped") {
    assert(!numeric.canSkip(RangePred("c", 20.0, 25)))
  }
  test("range fully containing stats is not skipped") {
    assert(!numeric.canSkip(RangePred("c", 0, 100)))
  }

  // --- RangePred vs categorical stats (distinct-set aware) ---
  test("range inside a distinct-set gap is skipped") {
    // [4, 6] misses {1, 3, 7} even though it overlaps [1, 7]
    assert(cat.canSkip(RangePred("c", 4, 6)))
  }
  test("range hitting a distinct value is not skipped") {
    assert(!cat.canSkip(RangePred("c", 3, 3)))
  }

  // --- InPred ---
  test("in-pred with empty intersection is skipped") {
    assert(cat.canSkip(InPred("c", Set(2.0, 4.0))))
  }
  test("in-pred with a hit is not skipped") {
    assert(!cat.canSkip(InPred("c", Set(2.0, 3.0))))
  }
  test("in-pred without distinct uses range bounds conservatively") {
    assert(numeric.canSkip(InPred("c", Set(1.0, 25.0))))
    assert(!numeric.canSkip(InPred("c", Set(15.0)))) // inside [10, 20]: cannot prove absence
  }

  // --- LayoutMetadata ---
  private val meta = LayoutMetadata(IndexedSeq(
    PartitionStats(0, 50, Map("a" -> ColumnStats(0, 10, None))),
    PartitionStats(1, 30, Map("a" -> ColumnStats(10, 20, None))),
    PartitionStats(2, 20, Map("a" -> ColumnStats(20, 30, None))),
  ))

  test("totalRows sums partitions") { assert(meta.totalRows == 100) }

  test("partitionsNeeded keeps only overlapping partitions") {
    assert(meta.partitionsNeeded(Query(0, 0, Seq(RangePred("a", 12, 15)))) == Seq(1))
  }
  test("fractionAccessed is row-weighted") {
    assert(meta.fractionAccessed(Query(0, 0, Seq(RangePred("a", 12, 15)))) == 0.30)
  }
  test("query touching all partitions costs 1.0") {
    assert(meta.fractionAccessed(Query(0, 0, Seq(RangePred("a", 0, 30)))) == 1.0)
  }
  test("boundary value appears in two partitions") {
    assert(meta.partitionsNeeded(Query(0, 0, Seq(RangePred("a", 10, 10)))) == Seq(0, 1))
  }
  test("unknown predicate column never skips") {
    assert(meta.fractionAccessed(Query(0, 0, Seq(RangePred("zzz", 0, 1)))) == 1.0)
  }
  test("multi-predicate query skips if any predicate is disjoint") {
    val q = Query(0, 0, Seq(RangePred("a", 0, 30), RangePred("a", 25, 30)))
    assert(meta.partitionsNeeded(q) == Seq(2))
  }
  test("fractionPartitionsSkipped counts partitions, not rows") {
    val q = Query(0, 0, Seq(RangePred("a", 12, 15)))
    assert(math.abs(meta.fractionPartitionsSkipped(q) - 2.0 / 3) < 1e-12)
  }
}
