package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** CLIMBER query processing (§VI): Algorithm 3 (CLIMBER-kNN), the adaptive
  * variations (2X/4X partition caps), the OD-Smallest ablation, and the
  * localized ED re-ranking within the identified partitions.
  */
object ClimberQuery {

  /** The three query variations evaluated in §VII plus the ablation. */
  sealed trait Variant { def label: String }
  case object Knn extends Variant { val label = "CLIMBER-kNN" }
  final case class Adaptive(factor: Int) extends Variant { val label = s"CLIMBER-kNN-Adaptive-${factor}X" }
  case object OdSmallest extends Variant { val label = "OD-Smallest" }

  /** Result of skeleton navigation: the partitions to load. */
  final case class QueryPlan(groupIds: Seq[Int], nodeDepth: Int, nodeSize: Long,
                             partitions: Array[Int])

  private def mix(z0: Long): Long = {
    var z = z0 + 0x9E3779B97F4A7C15L
    z = (z ^ (z >>> 30)) * 0xBF58476D1CE4E5B9L
    z = (z ^ (z >>> 27)) * 0x94D049BB133111EBL
    z ^ (z >>> 31)
  }

  /** Groups surviving lines 5-9 of Algorithm 3: smallest OD, then (on ties)
    * smallest WD. Falls back to G₀ when the query overlaps no centroid.
    */
  private def candidateGroups(skeleton: IndexSkeleton, rs: Array[Int],
                              ri: Array[Int]): Seq[Group] = {
    val m = ri.length
    val gs = skeleton.groups.drop(1)
    if (gs.isEmpty) return Seq(skeleton.groups(0))
    val od = gs.map(g => Distances.overlap(g.centroid, ri))
    val minOd = od.min
    if (minOd == m) return Seq(skeleton.groups(0))
    val tied = gs.zip(od).collect { case (g, d) if d == minOd => g }
    if (tied.size == 1) tied
    else {
      val wd = tied.map(g => Distances.weightDistance(rs, g.centroid, skeleton.decay))
      val minWd = wd.min
      tied.zip(wd).collect { case (g, d) if d == minWd => g }
    }
  }

  /** Algorithm 3: pick the single best (group, trie node) and return its
    * physical partitions.
    */
  def plan(skeleton: IndexSkeleton, rs: Array[Int], ri: Array[Int],
           querySeed: Long = 0): QueryPlan = {
    val cands = candidateGroups(skeleton, rs, ri)
    val navigated = cands.map(g => (g, g.root.navigate(rs)))
    // Lines 14-17: longest path, then largest node.
    val maxDepth = navigated.map(_._2.depth).max
    val deepest = navigated.filter(_._2.depth == maxDepth)
    val maxSize = deepest.map(_._2.size).max
    val biggest = deepest.filter(_._2.size == maxSize)
    // Lines 18-19: random (deterministic in the query seed) final tie-break.
    val (g, node) =
      if (biggest.size == 1) biggest.head
      else biggest((((mix(querySeed) % biggest.size) + biggest.size) % biggest.size).toInt)
    QueryPlan(Seq(g.id), node.depth, node.size, node.partitions)
  }

  /** CLIMBER-kNN-Adaptive (§VI): when the best node holds fewer than `k`
    * candidates, expand over further best-matching trie nodes (the deepest
    * node of every tied group plus its parent — the "longest and 2nd-longest
    * best matches") until the estimated candidate count covers `k`, capped
    * at `factor ×` the base plan's partition count.
    */
  def planAdaptive(skeleton: IndexSkeleton, rs: Array[Int], ri: Array[Int],
                   k: Int, factor: Int, querySeed: Long = 0): QueryPlan = {
    val base = plan(skeleton, rs, ri, querySeed)
    if (base.nodeSize >= k) return base
    val maxParts = math.max(1, factor * base.partitions.length)
    val cands = candidateGroups(skeleton, rs, ri)
    val nodes = cands.flatMap { g =>
      val deepest = g.root.navigate(rs)
      val second =
        if (deepest.depth >= 1) Some(g.root.navigate(rs.take(deepest.depth - 1))) else None
      (Seq((g, deepest)) ++ second.map(n => (g, n))).distinct
    }.distinct.sortBy { case (g, n) => (-n.depth, -n.size, g.id) }
    val partsSet = scala.collection.mutable.LinkedHashSet[Int](base.partitions.toSeq: _*)
    val groups = scala.collection.mutable.LinkedHashSet[Int](base.groupIds: _*)
    var covered = base.nodeSize
    val it = nodes.iterator
    while (covered < k && it.hasNext && partsSet.size < maxParts) {
      val (g, n) = it.next()
      val fresh = n.partitions.filterNot(partsSet.contains)
      if (fresh.nonEmpty && partsSet.size + fresh.length <= maxParts) {
        partsSet ++= fresh
        groups += g.id
        covered += n.size
      }
    }
    QueryPlan(groups.toSeq, base.nodeDepth, base.nodeSize, partsSet.toArray)
  }

  /** OD-Smallest ablation (§VII-C, Fig. 11(b)): scan every partition of
    * every group whose OD to the query is the smallest (stop at line 6 of
    * Algorithm 3).
    */
  def planOdSmallest(skeleton: IndexSkeleton, rs: Array[Int], ri: Array[Int]): QueryPlan = {
    val m = ri.length
    val gs = skeleton.groups.drop(1)
    val tied =
      if (gs.isEmpty) Seq(skeleton.groups(0))
      else {
        val od = gs.map(g => Distances.overlap(g.centroid, ri))
        val minOd = od.min
        if (minOd == m) Seq(skeleton.groups(0))
        else gs.zip(od).collect { case (g, d) if d == minOd => g }
      }
    val parts = tied.flatMap(_.root.partitions).distinct.sorted.toArray
    QueryPlan(tied.map(_.id), 0, tied.map(_.root.size).sum, parts)
  }

  /** Plan for a raw query series under the requested variant. */
  def planFor(index: ClimberIndex, query: Array[Double], k: Int, variant: Variant,
              querySeed: Long = 0): QueryPlan = {
    val paa = Paa.of(query, index.params.paaW)
    val (rs, ri) = index.pivots.dual(paa)
    variant match {
      case Knn              => plan(index.skeleton, rs, ri, querySeed)
      case Adaptive(factor) => planAdaptive(index.skeleton, rs, ri, k, factor, querySeed)
      case OdSmallest       => planOdSmallest(index.skeleton, rs, ri)
    }
  }

  /** Localized record-level similarity (§VI): load the identified
    * partitions, ED-rank their records against the query, return the top-K
    * (id, distance) pairs with a deterministic (distance, id) order.
    */
  def scanTopK(data: DataFrame, partCol: String, partitions: Array[Int],
               query: Array[Double], k: Int): Seq[(Long, Double)] = {
    val ed = udf { (xs: Seq[Double]) => Distances.euclidean(xs.toArray, query) }
    data
      .filter(col(partCol).isin(partitions.toSeq: _*))
      .select(col("id"), ed(col("series")).as("dist"))
      .orderBy(col("dist"), col("id"))
      .limit(k)
      .collect()
      .map(r => (r.getLong(0), r.getDouble(1)))
      .toSeq
  }

  /** End-to-end approximate kNN under a variant. */
  def knn(index: ClimberIndex, query: Array[Double], k: Int, variant: Variant,
          querySeed: Long = 0): Seq[(Long, Double)] = {
    val p = planFor(index, query, k, variant, querySeed)
    scanTopK(index.data, "part", p.partitions, query, k)
  }
}
