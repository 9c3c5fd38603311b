package repro.eval

import org.scalatest.funsuite.AnyFunSuite

class GroupingAccuracySpec extends AnyFunSuite {

  test("perfect grouping scores 1") {
    assert(GroupingAccuracy.compute(IndexedSeq(0, 0, 1, 1), IndexedSeq(5, 5, 9, 9)) == 1.0)
  }

  test("identical partition under renamed ids scores 1") {
    assert(GroupingAccuracy.compute(IndexedSeq(7, 7, 3), IndexedSeq(0, 0, 1)) == 1.0)
  }

  test("one merged pair disqualifies both groups") {
    // pred merges both truth groups → every log wrong
    assert(GroupingAccuracy.compute(IndexedSeq(0, 0, 0, 0), IndexedSeq(1, 1, 2, 2)) == 0.0)
  }

  test("one split group disqualifies all its logs") {
    assert(GroupingAccuracy.compute(IndexedSeq(0, 1, 2, 2), IndexedSeq(1, 1, 2, 2)) == 0.5)
  }

  test("partially correct grouping") {
    // truth groups: {0,1}, {2,3}, {4}; pred: {0,1} ok, {2,3,4} merged
    assert(GroupingAccuracy.compute(IndexedSeq(0, 0, 1, 1, 1), IndexedSeq(0, 0, 1, 1, 2)) == 0.4)
  }

  test("empty input scores 1") {
    assert(GroupingAccuracy.compute(IndexedSeq.empty, IndexedSeq.empty) == 1.0)
  }

  test("length mismatch is rejected") {
    assertThrows[IllegalArgumentException](
      GroupingAccuracy.compute(IndexedSeq(1), IndexedSeq(1, 2)))
  }

  test("singletons count when truth is singleton") {
    assert(GroupingAccuracy.compute(IndexedSeq(0, 1, 2), IndexedSeq(9, 8, 7)) == 1.0)
  }

  test("strictness: a single stray log poisons the whole group (paper §5.1.3)") {
    // 9 logs of truth A grouped together but 1 stray in group with truth B
    val pred = IndexedSeq(0, 0, 0, 0, 0, 0, 0, 0, 0, 1, 1)
    val truth = IndexedSeq(0, 0, 0, 0, 0, 0, 0, 0, 0, 0, 1)
    assert(GroupingAccuracy.compute(pred, truth) == 0.0)
  }
}
