package repro.core

import repro.core.Distances.Decay

/** Algorithm 1 — Group Assignment Rules (§IV-C).
  *
  * An object X (with dual signatures rs/ri) is assigned to one of the group
  * centroids (rank-insensitive signatures) by:
  *   1. smallest Overlap Distance (Def. 7); if X overlaps *no* centroid at
  *      all (all OD = m) it falls back to the special group G₀ (id 0);
  *   2. ties broken by smallest Weight Distance (Def. 11) using the decayed
  *      pivot weights of X's rank-sensitive signature;
  *   3. remaining ties broken by a deterministic pseudo-random pick keyed on
  *      the record id (the paper picks randomly; keying on the id keeps the
  *      whole pipeline reproducible).
  *
  * Centroid ids are 1-based; id 0 is reserved for the fall-back group G₀
  * whose centroid is the special `<*,*,…>` entry of Algorithm 2.
  */
object GroupAssign {

  private def mix(z0: Long): Long = {
    var z = z0 + 0x9E3779B97F4A7C15L
    z = (z ^ (z >>> 30)) * 0xBF58476D1CE4E5B9L
    z = (z ^ (z >>> 27)) * 0x94D049BB133111EBL
    z ^ (z >>> 31)
  }

  /** Deterministic stand-in for Algorithm 1's random tie-break. */
  def tieBreak(recordId: Long, candidates: Seq[Int]): Int = {
    val h = mix(recordId)
    candidates(((h % candidates.size) + candidates.size).toInt % candidates.size)
  }

  /** Assign one object. `centroids` maps 1-based group id → sorted
    * rank-insensitive signature. Returns the chosen group id (0 = G₀).
    */
  def assign(recordId: Long, rs: Array[Int], ri: Array[Int],
             centroids: IndexedSeq[Array[Int]], decay: Decay): Int = {
    val m = ri.length
    if (centroids.isEmpty) return 0
    val od = centroids.map(c => Distances.overlap(c, ri))
    val minOd = od.min
    if (minOd == m) return 0 // Lines 3-5: zero overlap with every centroid
    val best = od.zipWithIndex.collect { case (d, i) if d == minOd => i }
    if (best.size == 1) return best.head + 1 // Lines 6-7
    // Lines 8-12: tie — refine with the Weight Distance.
    val wd = best.map(i => Distances.weightDistance(rs, centroids(i), decay))
    val minWd = wd.min
    val best2 = best.zip(wd).collect { case (i, d) if d == minWd => i }
    if (best2.size == 1) return best2.head + 1
    // Lines 13-14: second tie — (deterministic) random pick.
    tieBreak(recordId, best2.map(_ + 1))
  }
}
