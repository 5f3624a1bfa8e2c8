package repro.memory

import org.apache.spark.sql.DataFrame

/** ParlayANN-HNSW simulator [42] for Table I: a *single-node, multi-core,
  * main-memory* graph-based ANN system.
  *
  * Reproduced behaviours: (1) construction is by far the most expensive of
  * the three systems (parallel graph building); (2) queries are sub-second
  * with ~0.9 recall; (3) the entire graph + vectors must fit in one node's
  * RAM, so the budget is half the simulated cluster's (the paper runs it on
  * only one of the two nodes) and Table I shows "X" earlier than Odyssey.
  */
final class ParlayAnnSim(val ids: Array[Long], hnsw: Hnsw, efSearch: Int) {

  def knn(query: Array[Double], k: Int): Seq[(Long, Double)] =
    hnsw.search(query, k, math.max(efSearch, k + k / 4)).map { case (i, d) => (ids(i), d) }

  def knnBatch(queries: Seq[(Long, Array[Double])], k: Int): Map[Long, Seq[(Long, Double)]] = {
    import scala.concurrent.{Await, ExecutionContext, Future}
    import scala.concurrent.duration.Duration
    implicit val ec: ExecutionContext = ExecutionContext.global
    val futs = queries.map { case (qid, q) => Future((qid, knn(q, k))) }
    Await.result(Future.sequence(futs), Duration.Inf).toMap
  }
}

object ParlayAnnSim {

  /** Build, honouring the single-node memory budget (in series). */
  def build(data: DataFrame, nSeries: Long, budgetSeries: Long, m: Int = 16,
            efConstruction: Int = 100, efSearch: Int = 600,
            threads: Int = Runtime.getRuntime.availableProcessors(),
            seed: Long = 1): Either[String, ParlayAnnSim] = {
    if (nSeries > budgetSeries)
      Left(s"dataset of $nSeries series exceeds the single-node budget of $budgetSeries")
    else {
      val rows = data.select("id", "series").collect()
      val ids = rows.map(_.getLong(0))
      val pts = rows.map(_.getSeq[Double](1).toArray)
      val g = new Hnsw(pts, m, efConstruction, seed)
      g.build(threads)
      Right(new ParlayAnnSim(ids, g, efSearch))
    }
  }
}
