package repro.exp

import org.apache.spark.sql.SparkSession
import repro.core.{ClimberIndex, ClimberParams, ClimberQuery}
import repro.isax.{BaselineCommon, BaselineIndex, DpiSax, Tardis}
import repro.scan.Dss

/** Figure 9 — the K sweep on RandomWalk 400 GB: (a) recall and (b) the
  * query-time table, for Dss, TARDIS, DPiSAX and the three CLIMBER
  * variations. Ground truth is computed once at the maximum K and sliced
  * (the exact top-k for k' < k is the prefix of the exact top-k ranking).
  *
  * Besides wall-clock time we report the mean number of rows scanned per
  * query — §VII-B: query time "incorporates as a dominant factor the number
  * of partitions touched", and at bench scale the per-job overhead would
  * otherwise mask that factor.
  */
object FigNine {

  final case class Row(k: Int, system: String, qrtSec: Double, recall: Double,
                       rowsScanned: Double) {
    def cells: Seq[String] =
      Seq(k.toString, system, f"$qrtSec%.2f", f"$recall%.2f", f"$rowsScanned%.0f")
  }

  final case class Config(
      sizeGb: Int = 400,
      ks: Seq[Int] = Seq(50, 100, 500, 1000, 2000),
      nQueries: Int = 20,
      nDssTimedQueries: Int = 3,
      climber: ClimberParams = Workloads.benchParams,
  )

  def run(spark: SparkSession, cfg: Config = Config()): Seq[Row] = {
    val rows = scala.collection.mutable.ArrayBuffer[Row]()
    val n = cfg.sizeGb.toLong * Workloads.SeriesPerGb
    val maxK = cfg.ks.max
    val df = Workloads.dataset(spark, "RandomWalk", n)
    val qs = Workloads.queries("RandomWalk", n, cfg.nQueries)
    val truthMax = Dss.knnBatch(spark, df, qs, maxK)

    val dpisax = DpiSax.index(spark, df, cfg.climber.capacity, alpha = cfg.climber.alpha)
    val tardis = Tardis.index(spark, df, cfg.climber.capacity, alpha = cfg.climber.alpha)
    val climber = ClimberIndex.build(spark, df, cfg.climber)

    def partSizes(data: org.apache.spark.sql.DataFrame): Map[Int, Long] =
      data.groupBy("part").count().collect().map(r => r.getInt(0) -> r.getLong(1)).toMap
    val dpSizes = partSizes(dpisax.data)
    val tdSizes = partSizes(tardis.data)
    val clSizes = partSizes(climber.data)

    def baselineRun(bi: BaselineIndex, sizes: Map[Int, Long])(qid: Long, q: Array[Double],
                                                              k: Int): (Seq[Long], Long) = {
      val part = bi.router.route(BaselineCommon.wordOf(q, bi.paaW, bi.bits))
      (BaselineCommon.knn(bi, q, k).map(_._1), sizes.getOrElse(part, 0L))
    }
    def climberRun(v: ClimberQuery.Variant)(qid: Long, q: Array[Double],
                                            k: Int): (Seq[Long], Long) = {
      val plan = ClimberQuery.planFor(climber, q, k, v, qid)
      (ClimberQuery.scanTopK(climber.data, "part", plan.partitions, q, k).map(_._1),
        plan.partitions.map(p => clSizes.getOrElse(p, 0L)).sum)
    }

    val variants: Seq[(String, (Long, Array[Double], Int) => (Seq[Long], Long))] = Seq(
      "Dss" -> ((_: Long, q: Array[Double], k: Int) => (Dss.knn(df, q, k).map(_._1), n)),
      "DPiSAX" -> baselineRun(dpisax, dpSizes) _,
      "TARDIS" -> baselineRun(tardis, tdSizes) _,
      "CLIMBER-kNN" -> climberRun(ClimberQuery.Knn) _,
      "CLIMBER-kNN-Adaptive-2X" -> climberRun(ClimberQuery.Adaptive(2)) _,
      "CLIMBER-kNN-Adaptive-4X" -> climberRun(ClimberQuery.Adaptive(4)) _,
    )

    for (k <- cfg.ks; (name, f) <- variants) {
      val timedQs = if (name == "Dss") qs.take(cfg.nDssTimedQueries) else qs
      val perQ = timedQs.map { case (qid, q) =>
        val ((ids, scanned), t) = Workloads.timed(f(qid, q, k))
        (qid -> ids, t, scanned)
      }
      val rec = Workloads.meanRecall(perQ.map(_._1).toMap,
        truthMax.map { case (qid, ids) => qid -> ids.take(k) })
      rows += Row(k, name, perQ.map(_._2).sum / perQ.size,
        if (name == "Dss") 1.0 else rec,
        perQ.map(_._3).sum.toDouble / perQ.size)
    }
    dpisax.data.unpersist(); tardis.data.unpersist(); climber.data.unpersist(); df.unpersist()
    rows.toSeq
  }

  def render(rows: Seq[Row]): String =
    Workloads.table(Seq("K", "System", "Q.R.T(s)", "Recall", "RowsScanned"), rows.map(_.cells))
}
