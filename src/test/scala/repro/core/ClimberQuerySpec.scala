package repro.core

import repro.SparkSpec
import repro.core.Distances.ExpDecay
import repro.scan.Dss
import repro.series.SeriesGen

class ClimberQuerySpec extends SparkSpec {

  private val params = ClimberParams(paaW = 16, numPivots = 24, prefixLen = 4,
    alpha = 0.3, capacity = 200, seed = 7)
  private lazy val df = SeriesGen.generate(spark, "RandomWalk", 2000, seed = 1).cache()
  private lazy val index = ClimberIndex.build(spark, df, params)

  // ---------------- Skeleton navigation (Algorithm 3) ----------------

  /** A hand-built two-group skeleton mirroring Example 2 / Figure 5. */
  private lazy val manualSkeleton: IndexSkeleton = {
    val riAgg = Seq(
      Centroids.SigFreq(Array(1, 2, 3), 3000),
      Centroids.SigFreq(Array(4, 6, 7), 5250),
    )
    val rsAgg = Seq(
      Centroids.SigFreq(Array(1, 2, 3), 3000),
      Centroids.SigFreq(Array(6, 2, 7), 1800),
      Centroids.SigFreq(Array(6, 5, 1), 1900),
      Centroids.SigFreq(Array(4, 6, 7), 900),
      Centroids.SigFreq(Array(7, 6, 4), 650),
    )
    IndexSkeleton.build(riAgg, rsAgg, alpha = 1.0, capacity = 3000, epsilon = 2,
      decay = ExpDecay(0.5))
  }

  test("Example 2: the query selects the best group by OD") {
    val rs = Array(6, 2, 7); val ri = Array(2, 6, 7)
    val plan = ClimberQuery.plan(manualSkeleton, rs, ri)
    val g = manualSkeleton.groups(plan.groupIds.head)
    assert(g.centroid.toSeq == Seq(4, 6, 7)) // OD 1 beats OD 2
  }

  test("Example 2: trie navigation reaches the deepest matching node") {
    val rs = Array(6, 2, 7); val ri = Array(2, 6, 7)
    val plan = ClimberQuery.plan(manualSkeleton, rs, ri)
    assert(plan.nodeDepth == 2)
    assert(plan.nodeSize == 1800L)
  }

  test("a query with zero centroid overlap routes to G0") {
    val plan = ClimberQuery.plan(manualSkeleton, Array(10, 11, 12), Array(10, 11, 12))
    assert(plan.groupIds == Seq(0))
  }

  test("plan partitions are valid skeleton partitions") {
    val plan = ClimberQuery.plan(manualSkeleton, Array(6, 5, 1), Array(1, 5, 6))
    assert(plan.partitions.nonEmpty)
    assert(plan.partitions.forall(p => p >= 0 && p < manualSkeleton.numPartitions))
  }

  test("adaptive plan equals the base plan when the node already covers k") {
    val rs = Array(6, 2, 7); val ri = Array(2, 6, 7)
    val base = ClimberQuery.plan(manualSkeleton, rs, ri)
    val ad = ClimberQuery.planAdaptive(manualSkeleton, rs, ri, k = 500, factor = 4)
    assert(ad.partitions.toSeq == base.partitions.toSeq)
  }

  test("adaptive plan expands when the node holds fewer than k (§VI)") {
    val rs = Array(6, 2, 7); val ri = Array(2, 6, 7)
    val base = ClimberQuery.plan(manualSkeleton, rs, ri)
    val ad = ClimberQuery.planAdaptive(manualSkeleton, rs, ri, k = 2500, factor = 4)
    assert(ad.partitions.length >= base.partitions.length)
    assert(base.partitions.toSet.subsetOf(ad.partitions.toSet))
  }

  test("adaptive plan respects the partition cap factor") {
    val rs = Array(6, 2, 7); val ri = Array(2, 6, 7)
    val base = ClimberQuery.plan(manualSkeleton, rs, ri)
    for (factor <- Seq(2, 4)) {
      val ad = ClimberQuery.planAdaptive(manualSkeleton, rs, ri, k = 100000, factor = factor)
      assert(ad.partitions.length <= factor * base.partitions.length)
    }
  }

  test("2X plan partitions are a subset of the 4X plan partitions") {
    val rs = Array(6, 2, 7); val ri = Array(2, 6, 7)
    val p2 = ClimberQuery.planAdaptive(manualSkeleton, rs, ri, 100000, 2)
    val p4 = ClimberQuery.planAdaptive(manualSkeleton, rs, ri, 100000, 4)
    assert(p2.partitions.toSet.subsetOf(p4.partitions.toSet))
  }

  test("OD-Smallest covers every partition of the tied groups") {
    val rs = Array(6, 2, 7); val ri = Array(2, 6, 7)
    val od = ClimberQuery.planOdSmallest(manualSkeleton, rs, ri)
    val base = ClimberQuery.plan(manualSkeleton, rs, ri)
    assert(base.partitions.toSet.subsetOf(od.partitions.toSet))
    val g = manualSkeleton.groups.find(_.centroid.toSeq == Seq(4, 6, 7)).get
    assert(od.partitions.toSet == g.root.partitions.toSet)
  }

  // ---------------- End-to-end kNN on real data ----------------

  private lazy val queries = Seq(3L, 444L, 1200L).map(id =>
    (id, SeriesGen.local("RandomWalk", id, 1)))

  test("kNN returns k results sorted by distance") {
    val (qid, q) = queries.head
    val res = ClimberQuery.knn(index, q, 20, ClimberQuery.Knn, qid)
    assert(res.size == 20)
    assert(res.map(_._2) == res.map(_._2).sorted)
  }

  test("a query drawn from the dataset finds itself at distance 0") {
    for ((qid, q) <- queries) {
      val res = ClimberQuery.knn(index, q, 10, ClimberQuery.Adaptive(4), qid)
      assert(res.head._1 == qid, s"query $qid did not find itself")
      assert(res.head._2 == 0.0)
    }
  }

  test("recall of Adaptive-4X beats a random partition's expected recall") {
    val truth = Dss.knnBatch(spark, df, queries, 50)
    val recalls = queries.map { case (qid, q) =>
      val ids = ClimberQuery.knn(index, q, 50, ClimberQuery.Adaptive(4), qid).map(_._1)
      repro.exp.Workloads.recall(ids, truth(qid))
    }
    val mean = recalls.sum / recalls.size
    // A random partition of capacity ~200 out of 2000 records would give ~0.1.
    assert(mean > 0.3, s"mean recall $mean")
  }

  test("OD-Smallest recall is at least that of CLIMBER-kNN") {
    val truth = Dss.knnBatch(spark, df, queries, 50)
    val rKnn = queries.map { case (qid, q) =>
      repro.exp.Workloads.recall(
        ClimberQuery.knn(index, q, 50, ClimberQuery.Knn, qid).map(_._1), truth(qid))
    }
    val rOd = queries.map { case (qid, q) =>
      repro.exp.Workloads.recall(
        ClimberQuery.knn(index, q, 50, ClimberQuery.OdSmallest, qid).map(_._1), truth(qid))
    }
    assert(rOd.sum >= rKnn.sum - 1e-9)
  }

  test("scanTopK on all partitions equals the exact Dss answer") {
    val (qid, q) = queries(1)
    val allParts = (0 until index.skeleton.numPartitions).toArray
    val full = ClimberQuery.scanTopK(index.data, "part", allParts, q, 30)
    val exact = Dss.knn(df, q, 30)
    assert(full.map(_._1) == exact.map(_._1))
  }

  test("planFor dispatches all variants") {
    val (qid, q) = queries.head
    val variants = Seq(ClimberQuery.Knn, ClimberQuery.Adaptive(2), ClimberQuery.Adaptive(4),
      ClimberQuery.OdSmallest)
    for (v <- variants) {
      val p = ClimberQuery.planFor(index, q, 50, v, qid)
      assert(p.partitions.nonEmpty)
    }
  }

  test("variant labels match the paper's names") {
    assert(ClimberQuery.Knn.label == "CLIMBER-kNN")
    assert(ClimberQuery.Adaptive(2).label == "CLIMBER-kNN-Adaptive-2X")
    assert(ClimberQuery.Adaptive(4).label == "CLIMBER-kNN-Adaptive-4X")
  }
}
