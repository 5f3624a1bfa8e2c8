package repro.exp

import org.apache.spark.sql.SparkSession
import repro.core.{ClimberIndex, ClimberParams, ClimberQuery}
import repro.isax.{BaselineCommon, DpiSax, Tardis}
import repro.scan.Dss

/** Figures 7(a,b) and 8(a,b) rendered as a table: for each dataset at the
  * 200 GB-equivalent scale, the query time, recall, and mean rows scanned
  * per query of Dss / DPiSAX / TARDIS / CLIMBER (7), plus index
  * construction time and global index size (8; Dss builds no index). Rows
  * scanned is reported because §VII-B attributes query time primarily to
  * the partitions touched, and per-job overhead masks that at bench scale.
  */
object FigSeven {

  final case class Row(dataset: String, system: String, qrtSec: Double, recall: Double,
                       rowsScanned: Double, ictSec: Double, indexKb: Double) {
    def cells: Seq[String] = Seq(dataset, system, f"$qrtSec%.2f", f"$recall%.2f",
      f"$rowsScanned%.0f",
      if (ictSec.isNaN) "-" else f"$ictSec%.1f",
      if (indexKb.isNaN) "-" else f"$indexKb%.1f")
  }

  final case class Config(
      datasets: Seq[String] = repro.series.SeriesGen.Datasets,
      sizeGb: Int = 200,
      k: Int = 500,
      nQueries: Int = 20,
      nDssTimedQueries: Int = 5, // Dss is slow; time it on a subset
      climber: ClimberParams = Workloads.benchParams,
  )

  def run(spark: SparkSession, cfg: Config = Config()): Seq[Row] = {
    val rows = scala.collection.mutable.ArrayBuffer[Row]()
    val n = cfg.sizeGb.toLong * Workloads.SeriesPerGb
    for (ds <- cfg.datasets) {
      val df = Workloads.dataset(spark, ds, n)
      val qs = Workloads.queries(ds, n, cfg.nQueries)
      val truth = Dss.knnBatch(spark, df, qs, cfg.k)

      // Dss: exact by construction; time a subset of single-query scans.
      val dssTimes = qs.take(cfg.nDssTimedQueries).map { case (_, q) =>
        Workloads.timed(Dss.knn(df, q, cfg.k))._2
      }
      rows += Row(ds, "Dss", dssTimes.sum / dssTimes.size, 1.0, n.toDouble,
        Double.NaN, Double.NaN)

      // DPiSAX and TARDIS: one-partition approximate search.
      for ((name, bi) <- Seq(
          "DPiSAX" -> DpiSax.index(spark, df, cfg.climber.capacity, alpha = cfg.climber.alpha),
          "TARDIS" -> Tardis.index(spark, df, cfg.climber.capacity, alpha = cfg.climber.alpha))) {
        val sizes = bi.data.groupBy("part").count().collect()
          .map(r => r.getInt(0) -> r.getLong(1)).toMap
        val perQ = qs.map { case (qid, q) =>
          val (res, t) = Workloads.timed(BaselineCommon.knn(bi, q, cfg.k))
          val part = bi.router.route(BaselineCommon.wordOf(q, bi.paaW, bi.bits))
          (qid -> res.map(_._1), t, sizes.getOrElse(part, 0L))
        }
        rows += Row(ds, name, perQ.map(_._2).sum / perQ.size,
          Workloads.meanRecall(perQ.map(_._1).toMap, truth),
          perQ.map(_._3).sum.toDouble / perQ.size, bi.buildSec, bi.indexBytes / 1024.0)
        bi.data.unpersist()
      }

      // CLIMBER default variation (Adaptive-4X).
      val (index, ict) = Workloads.timed(ClimberIndex.build(spark, df, cfg.climber))
      val clSizes = index.data.groupBy("part").count().collect()
        .map(r => r.getInt(0) -> r.getLong(1)).toMap
      val perQ = qs.map { case (qid, q) =>
        val plan = ClimberQuery.planFor(index, q, cfg.k, ClimberQuery.Adaptive(4), qid)
        val (res, t) = Workloads.timed(
          ClimberQuery.scanTopK(index.data, "part", plan.partitions, q, cfg.k))
        (qid -> res.map(_._1), t, plan.partitions.map(p => clSizes.getOrElse(p, 0L)).sum)
      }
      rows += Row(ds, "CLIMBER", perQ.map(_._2).sum / perQ.size,
        Workloads.meanRecall(perQ.map(_._1).toMap, truth),
        perQ.map(_._3).sum.toDouble / perQ.size, ict,
        index.stats.skeletonBytes / 1024.0)
      index.data.unpersist()
      df.unpersist()
    }
    rows.toSeq
  }

  def render(rows: Seq[Row]): String =
    Workloads.table(
      Seq("Dataset", "System", "Q.R.T(s)", "Recall", "RowsScanned", "I.C.T(s)", "Index(KB)"),
      rows.map(_.cells))
}
