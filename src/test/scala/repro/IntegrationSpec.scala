package repro

import repro.core._
import repro.isax.{BaselineCommon, DpiSax, Tardis}
import repro.scan.Dss
import repro.series.SeriesGen

/** End-to-end integration: build every system on the same small dataset and
  * check the paper's qualitative claims — CLIMBER's recall dominates the
  * iSAX baselines while touching few partitions.
  */
class IntegrationSpec extends SparkSpec {

  private val n = 4000L
  private val k = 100
  private lazy val df = SeriesGen.generate(spark, "RandomWalk", n, seed = 21).cache()
  private lazy val queries =
    repro.exp.Workloads.queries("RandomWalk", n, 8, seed = 5)
      .map { case (qid, _) => (qid, SeriesGen.local("RandomWalk", qid, 21)) }
  private lazy val truth = Dss.knnBatch(spark, df, queries, k)

  private lazy val climber = ClimberIndex.build(spark, df,
    ClimberParams(paaW = 16, numPivots = 48, prefixLen = 6, alpha = 0.25, capacity = 400, seed = 3))
  private lazy val dpisax = DpiSax.index(spark, df, capacity = 400, alpha = 0.25)
  private lazy val tardis = Tardis.index(spark, df, capacity = 400, alpha = 0.25)

  private def meanRecall(f: ((Long, Array[Double])) => Seq[Long]): Double = {
    val rs = queries.map { q => repro.exp.Workloads.recall(f(q), truth(q._1)) }
    rs.sum / rs.size
  }

  private lazy val rClimber = meanRecall { case (qid, q) =>
    ClimberQuery.knn(climber, q, k, ClimberQuery.Adaptive(4), qid).map(_._1)
  }
  private lazy val rDpisax = meanRecall { case (_, q) =>
    BaselineCommon.knn(dpisax, q, k).map(_._1)
  }
  private lazy val rTardis = meanRecall { case (_, q) =>
    BaselineCommon.knn(tardis, q, k).map(_._1)
  }

  test("all three systems index every record") {
    assert(climber.data.count() == n)
    assert(dpisax.data.count() == n)
    assert(tardis.data.count() == n)
  }

  test("Dss ground truth has recall 1.0 by definition") {
    queries.foreach { case (qid, _) => assert(truth(qid).size == k) }
  }

  test("CLIMBER recall exceeds DPiSAX recall (the paper's headline ordering)") {
    assert(rClimber > rDpisax, f"CLIMBER $rClimber%.3f vs DPiSAX $rDpisax%.3f")
  }

  test("CLIMBER recall is at least TARDIS-competitive") {
    assert(rClimber >= rTardis - 0.05, f"CLIMBER $rClimber%.3f vs TARDIS $rTardis%.3f")
  }

  test("CLIMBER recall is substantial in absolute terms") {
    assert(rClimber > 0.4, f"CLIMBER recall $rClimber%.3f")
  }

  test("every query self-hit is found by CLIMBER") {
    queries.foreach { case (qid, q) =>
      val ids = ClimberQuery.knn(climber, q, k, ClimberQuery.Adaptive(4), qid).map(_._1)
      assert(ids.contains(qid), s"query $qid lost itself")
    }
  }

  test("CLIMBER plans touch a small fraction of the partitions") {
    queries.foreach { case (qid, q) =>
      val p = ClimberQuery.planFor(climber, q, k, ClimberQuery.Adaptive(4), qid)
      assert(p.partitions.length <= math.max(4, climber.skeleton.numPartitions / 2),
        s"plan touches ${p.partitions.length} of ${climber.skeleton.numPartitions}")
    }
  }

  test("adaptive variants never lose recall versus the base variant") {
    val rBase = meanRecall { case (qid, q) =>
      ClimberQuery.knn(climber, q, k, ClimberQuery.Knn, qid).map(_._1)
    }
    assert(rClimber >= rBase - 1e-9, f"Adaptive-4X $rClimber%.3f < base $rBase%.3f")
  }
}
