package repro.exp

import org.apache.spark.sql.SparkSession
import repro.core.{ClimberIndex, ClimberParams, ClimberQuery}
import repro.scan.Dss

/** The CLIMBER ablations rendered as tables:
  *   - Figure 11(b): the OD-Smallest search (all partitions of every
  *     smallest-OD group) vs the three CLIMBER variations — relative data
  *     accessed and relative recall.
  *   - Figure 12: the prefix-length sweep — index construction time, global
  *     index size, query time, and recall, absolute and relative to the
  *     bench default prefix length (Workloads.benchParams).
  */
object Ablation {

  final case class OdRow(system: String, rowsAccessed: Double, recall: Double,
                         relData: Double, relRecall: Double) {
    def cells: Seq[String] = Seq(system, f"$rowsAccessed%.0f", f"$recall%.2f",
      f"$relData%.2fx", f"$relRecall%.2fx")
  }

  final case class PrefixRow(m: Int, ictSec: Double, indexKb: Double, qrtSec: Double,
                             recall: Double) {
    def cells(base: PrefixRow): Seq[String] = Seq(m.toString,
      f"$ictSec%.1f (${ictSec / base.ictSec}%.2fx)",
      f"$indexKb%.1f (${indexKb / base.indexKb}%.2fx)",
      f"$qrtSec%.2f (${qrtSec / base.qrtSec}%.2fx)",
      f"$recall%.2f (${recall / base.recall}%.2fx)")
  }

  final case class Config(
      sizeGb: Int = 200,
      k: Int = 500,
      nQueries: Int = 20,
      prefixLens: Seq[Int] = Seq(4, 6, 10, 15, 20),
      climber: ClimberParams = Workloads.benchParams,
  )

  /** Figure 11(b): OD-Smallest vs CLIMBER-kNN / Adaptive-2X / Adaptive-4X. */
  def runOdSmallest(spark: SparkSession, cfg: Config = Config()): Seq[OdRow] = {
    val n = cfg.sizeGb.toLong * Workloads.SeriesPerGb
    val df = Workloads.dataset(spark, "RandomWalk", n)
    val qs = Workloads.queries("RandomWalk", n, cfg.nQueries)
    val truth = Dss.knnBatch(spark, df, qs, cfg.k)
    val index = ClimberIndex.build(spark, df, cfg.climber)
    val partSizes = index.data.groupBy("part").count().collect()
      .map(r => r.getInt(0) -> r.getLong(1)).toMap

    val variants: Seq[(String, ClimberQuery.Variant)] = Seq(
      "CLIMBER-kNN" -> ClimberQuery.Knn,
      "CLIMBER-kNN-Adaptive-2X" -> ClimberQuery.Adaptive(2),
      "CLIMBER-kNN-Adaptive-4X" -> ClimberQuery.Adaptive(4),
      "OD-Smallest" -> ClimberQuery.OdSmallest,
    )
    val raw = variants.map { case (name, v) =>
      val perQ = qs.map { case (qid, q) =>
        val plan = ClimberQuery.planFor(index, q, cfg.k, v, qid)
        val accessed = plan.partitions.map(p => partSizes.getOrElse(p, 0L)).sum
        val ids = ClimberQuery.scanTopK(index.data, "part", plan.partitions, q, cfg.k).map(_._1)
        (qid -> ids, accessed)
      }
      val rec = Workloads.meanRecall(perQ.map(_._1).toMap, truth)
      (name, perQ.map(_._2).sum.toDouble / perQ.size, rec)
    }
    val od = raw.find(_._1 == "OD-Smallest").get
    val rows = raw.map { case (name, rowsAcc, rec) =>
      OdRow(name, rowsAcc, rec, od._2 / rowsAcc, od._3 / rec)
    }
    index.data.unpersist(); df.unpersist()
    rows
  }

  /** Figure 12: prefix-length sweep. */
  def runPrefix(spark: SparkSession, cfg: Config = Config()): Seq[PrefixRow] = {
    val n = cfg.sizeGb.toLong * Workloads.SeriesPerGb
    val df = Workloads.dataset(spark, "RandomWalk", n)
    val qs = Workloads.queries("RandomWalk", n, cfg.nQueries)
    val truth = Dss.knnBatch(spark, df, qs, cfg.k)
    val rows = cfg.prefixLens.map { m =>
      val params = cfg.climber.copy(prefixLen = m, epsilon = math.max(1, m / 2))
      val (index, ict) = Workloads.timed(ClimberIndex.build(spark, df, params))
      val perQ = qs.map { case (qid, q) =>
        val (res, t) = Workloads.timed(
          ClimberQuery.knn(index, q, cfg.k, ClimberQuery.Adaptive(4), qid))
        (qid -> res.map(_._1), t)
      }
      val rec = Workloads.meanRecall(perQ.map(_._1).toMap, truth)
      val row = PrefixRow(m, ict, index.stats.skeletonBytes / 1024.0,
        perQ.map(_._2).sum / perQ.size, rec)
      index.data.unpersist()
      row
    }
    df.unpersist()
    rows
  }

  def renderOd(rows: Seq[OdRow]): String =
    Workloads.table(Seq("System", "RowsAccessed", "Recall", "OD/this(data)", "OD/this(recall)"),
      rows.map(_.cells))

  def renderPrefix(rows: Seq[PrefixRow]): String = {
    val base = rows.find(_.m == Workloads.benchParams.prefixLen).getOrElse(rows.head)
    Workloads.table(Seq("PrefixLen", "I.C.T(s)", "Index(KB)", "Q.R.T(s)", "Recall"),
      rows.map(_.cells(base)))
  }
}
