package repro.jobs

import repro.core._
import repro.exp.Workloads
import repro.scan.Dss

/** Quick calibration probe (not part of any table): per-dataset CLIMBER
  * pivot-count sweep so bench parameters can be sanity-checked cheaply.
  */
object ProbeJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.get("climber-probe")
    val n = 50000L
    val k = 500
    for (ds <- Seq("SIFT", "EEG", "RandomWalk", "DNA")) {
      val df = Workloads.dataset(spark, ds, n)
      val qs = Workloads.queries(ds, n, 10)
      val truth = Dss.knnBatch(spark, df, qs, k)
      for ((r, m) <- Seq((64, 8), (128, 10), (200, 10), (256, 12))) {
        val index = ClimberIndex.build(spark, df,
          ClimberParams(numPivots = r, prefixLen = m, capacity = 2000))
        val res = qs.map { case (qid, q) =>
          qid -> ClimberQuery.knn(index, q, k, ClimberQuery.Adaptive(4), qid).map(_._1)
        }.toMap
        println(f"$ds r=$r m=$m groups=${index.stats.numGroups} parts=${index.stats.numPartitions} 4X=${Workloads.meanRecall(res, truth)}%.3f")
        index.data.unpersist()
      }
      df.unpersist()
    }
    spark.stop()
  }
}
