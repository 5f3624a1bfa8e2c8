package repro.core

import repro.SparkSpec
import repro.core.Distances.ExpDecay

class GroupAssignSpec extends SparkSpec {

  private val decay = ExpDecay(0.5)
  // Paper Example 1: centroids o1 = <1,2,3>, o2 = <2,4,5>.
  private val centroids = IndexedSeq(Array(1, 2, 3), Array(2, 4, 5))

  test("Example 1: X with rs=<3,4,1> is assigned to G1 by unique smallest OD") {
    val g = GroupAssign.assign(1L, Array(3, 4, 1), Array(1, 3, 4), centroids, decay)
    assert(g == 1)
  }

  test("Example 1: Y with rs=<4,2,1> ties on OD and goes to G2 by WD") {
    val g = GroupAssign.assign(2L, Array(4, 2, 1), Array(1, 2, 4), centroids, decay)
    assert(g == 2)
  }

  test("Example 1: Z with rs=<6,2,7> double-ties and lands in G1 or G2") {
    val g = GroupAssign.assign(3L, Array(6, 2, 7), Array(2, 6, 7), centroids, decay)
    assert(g == 1 || g == 2)
  }

  test("double-tie pick is deterministic per record id but varies across ids") {
    val picks = (0L until 200L).map(id =>
      GroupAssign.assign(id, Array(6, 2, 7), Array(2, 6, 7), centroids, decay))
    assert(picks.toSet == Set(1, 2)) // both groups are reachable
    val again = (0L until 200L).map(id =>
      GroupAssign.assign(id, Array(6, 2, 7), Array(2, 6, 7), centroids, decay))
    assert(picks == again) // and the pick is a pure function of the id
  }

  test("zero overlap with every centroid falls back to G0 (lines 3-5)") {
    val g = GroupAssign.assign(4L, Array(9, 8, 7), Array(7, 8, 9), centroids, decay)
    assert(g == 0)
  }

  test("exact centroid match wins") {
    val g = GroupAssign.assign(5L, Array(3, 2, 1), Array(1, 2, 3), centroids, decay)
    assert(g == 1)
  }

  test("empty centroid list always falls back to G0") {
    assert(GroupAssign.assign(6L, Array(1, 2, 3), Array(1, 2, 3), IndexedSeq.empty, decay) == 0)
  }

  test("assignment only depends on overlap, not on order within the ri signature") {
    // Same ri set as Example-1 X but a different rs ordering: OD is unique, so
    // the rank-sensitive part must not matter.
    val g = GroupAssign.assign(7L, Array(1, 3, 4), Array(1, 3, 4), centroids, decay)
    assert(g == 1)
  }

  test("WD tie-break prefers the centroid covering the higher-weighted pivot") {
    // rs = <10, 2> → pivot 10 has weight 1.0, pivot 2 has weight 0.5.
    // c1 = {2, 30}: covers the lesser pivot; c2 = {10, 31}: covers the top one.
    // Both have OD = 1.
    val cs = IndexedSeq(Array(2, 30), Array(10, 31))
    val g = GroupAssign.assign(8L, Array(10, 2), Array(2, 10), cs, decay)
    assert(g == 2)
  }

  test("tieBreak returns only candidates and is stable") {
    val cands = Seq(3, 5, 9)
    for (id <- 0L until 100L) {
      val p = GroupAssign.tieBreak(id, cands)
      assert(cands.contains(p))
      assert(p == GroupAssign.tieBreak(id, cands))
    }
  }

  test("tieBreak covers all candidates over many ids") {
    val cands = Seq(1, 2, 3, 4)
    val seen = (0L until 500L).map(GroupAssign.tieBreak(_, cands)).toSet
    assert(seen == cands.toSet)
  }

  test("a centroid that is a superset-overlap beats a partial overlap") {
    val cs = IndexedSeq(Array(1, 2, 9), Array(1, 2, 3))
    val g = GroupAssign.assign(9L, Array(3, 2, 1), Array(1, 2, 3), cs, decay)
    assert(g == 2) // OD 0 beats OD 1
  }
}
