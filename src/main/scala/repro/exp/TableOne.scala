package repro.exp

import org.apache.spark.sql.SparkSession
import repro.core.{ClimberIndex, ClimberParams, ClimberQuery}
import repro.memory.{OdysseySim, ParlayAnnSim}
import repro.scan.Dss

/** Table I — CLIMBER vs the in-memory systems Odyssey and ParlayANN-HNSW:
  * Index Construction Time (I.C.T), Query Response Time (Q.R.T), and
  * Results' Recall (R.R) over growing RandomWalk datasets. "X" marks a
  * system whose memory budget the dataset exceeds (see DESIGN.md §2 for the
  * budget model and the GB→series scale mapping).
  */
object TableOne {

  final case class Row(sizeGb: Int, system: String, ictSec: Double, qrtSec: Double,
                       recall: Double, status: String) {
    def cells: Seq[String] =
      if (status == "X") Seq(sizeGb.toString, system, "X", "X", "X")
      else Seq(sizeGb.toString, system, f"$ictSec%.1f", f"$qrtSec%.2f", f"$recall%.2f")
  }

  final case class Config(
      sizesGb: Seq[Int] = Seq(200, 400, 600, 800, 1000, 1500),
      k: Int = 500,
      nQueries: Int = 20,
      odysseyBudgetGb: Int = 800, // paper: X from 1000 GB on
      parlayBudgetGb: Int = 400, // paper: X from 600 GB on
      climber: ClimberParams = Workloads.benchParams,
  )

  def run(spark: SparkSession, cfg: Config = Config()): Seq[Row] = {
    val rows = scala.collection.mutable.ArrayBuffer[Row]()
    for (gb <- cfg.sizesGb) {
      val n = gb.toLong * Workloads.SeriesPerGb
      val df = Workloads.dataset(spark, "RandomWalk", n)
      val qs = Workloads.queries("RandomWalk", n, cfg.nQueries)
      val truth = Dss.knnBatch(spark, df, qs, cfg.k)

      // CLIMBER (default variation Adaptive-4X, §VII-A).
      val (index, ict) = Workloads.timed(ClimberIndex.build(spark, df, cfg.climber))
      val perQuery = qs.map { case (qid, q) =>
        val (res, t) = Workloads.timed(
          ClimberQuery.knn(index, q, cfg.k, ClimberQuery.Adaptive(4), querySeed = qid))
        (qid -> res.map(_._1), t)
      }
      val rec = Workloads.meanRecall(perQuery.map(_._1).toMap, truth)
      rows += Row(gb, "CLIMBER", ict, perQuery.map(_._2).sum / perQuery.size, rec, "ok")
      index.data.unpersist()

      // Odyssey: exact, in-memory, fails beyond the cluster RAM budget.
      if (n > cfg.odysseyBudgetGb.toLong * Workloads.SeriesPerGb)
        rows += Row(gb, "Odyssey", 0, 0, 0, "X")
      else {
        val (ody, ictO) = Workloads.timed(
          OdysseySim.build(df, n, Long.MaxValue, cfg.climber.paaW).toOption.get)
        val perQ = qs.map { case (qid, q) =>
          val (res, t) = Workloads.timed(ody.knn(q, cfg.k))
          (qid -> res.map(_._1), t)
        }
        rows += Row(gb, "Odyssey", ictO, perQ.map(_._2).sum / perQ.size,
          Workloads.meanRecall(perQ.map(_._1).toMap, truth), "ok")
      }

      // ParlayANN-HNSW: approximate, single-node, costly construction.
      if (n > cfg.parlayBudgetGb.toLong * Workloads.SeriesPerGb)
        rows += Row(gb, "ParlayANN", 0, 0, 0, "X")
      else {
        val (pa, ictP) = Workloads.timed(
          ParlayAnnSim.build(df, n, Long.MaxValue).toOption.get)
        val perQ = qs.map { case (qid, q) =>
          val (res, t) = Workloads.timed(pa.knn(q, cfg.k))
          (qid -> res.map(_._1), t)
        }
        rows += Row(gb, "ParlayANN", ictP, perQ.map(_._2).sum / perQ.size,
          Workloads.meanRecall(perQ.map(_._1).toMap, truth), "ok")
      }
      df.unpersist()
    }
    rows.toSeq
  }

  def render(rows: Seq[Row]): String =
    Workloads.table(Seq("Size(GB)", "System", "I.C.T(s)", "Q.R.T(s)", "R.R"), rows.map(_.cells))
}
