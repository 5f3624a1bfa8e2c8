package repro.memory

import org.apache.spark.sql.DataFrame
import repro.core.{Distances, Paa}

/** Odyssey-like simulator [16] for Table I: a distributed *main-memory*
  * engine for **exact** kNN over data series, built on iSAX/PAA summaries.
  *
  * We reproduce its defining behaviours at laptop scale: (1) the whole
  * dataset plus summaries must fit in RAM — a memory-budget model reports
  * "X" beyond the budget, exactly where the paper's Table I does; (2) index
  * construction is just loading + summarising (no re-distribution), so it
  * is several times cheaper than CLIMBER's; (3) queries are exact
  * (recall = 1.0) and fast, using PAA lower-bound pruning with a top-K heap
  * and multi-core parallelism across queries.
  */
final class OdysseySim(val ids: Array[Long], val series: Array[Array[Double]], paaW: Int) {
  private val n = series.headOption.map(_.length).getOrElse(0)
  private val paas: Array[Array[Double]] = series.map(Paa.of(_, paaW))

  /** Exact kNN: order candidates by PAA lower bound and stop scanning once
    * the bound exceeds the current k-th best true distance.
    */
  def knn(query: Array[Double], k: Int): Seq[(Long, Double)] = {
    val qp = Paa.of(query, paaW)
    val lb = new Array[Double](series.length)
    var i = 0
    while (i < series.length) { lb(i) = Distances.paaLowerBound(qp, paas(i), n); i += 1 }
    val order = Array.tabulate(series.length)(identity).sortBy(lb)
    // Max-heap of the best k (distance, id) seen so far.
    val heap = new java.util.PriorityQueue[(Double, Long)](k,
      (a: (Double, Long), b: (Double, Long)) => java.lang.Double.compare(b._1, a._1))
    var j = 0
    var done = false
    while (j < order.length && !done) {
      val idx = order(j)
      if (heap.size == k && lb(idx) > heap.peek()._1) done = true
      else {
        val d = Distances.euclidean(query, series(idx))
        if (heap.size < k) heap.add((d, ids(idx)))
        else if (d < heap.peek()._1) { heap.poll(); heap.add((d, ids(idx))) }
      }
      j += 1
    }
    /** fraction of the dataset whose true ED was computed (pruning power) */
    lastScanned = j
    heap.toArray(new Array[(Double, Long)](0)).toSeq
      .map { case (d, id) => (id, d) }
      .sortBy { case (id, d) => (d, id) }
  }

  @volatile var lastScanned: Int = 0

  /** Parallel batch over queries (Odyssey's strength is concurrent-query
    * scheduling; a fixed thread pool stands in for it).
    */
  def knnBatch(queries: Seq[(Long, Array[Double])], k: Int): Map[Long, Seq[(Long, Double)]] = {
    import scala.concurrent.{Await, ExecutionContext, Future}
    import scala.concurrent.duration.Duration
    implicit val ec: ExecutionContext = ExecutionContext.global
    val futs = queries.map { case (qid, q) => Future((qid, knn(q, k))) }
    Await.result(Future.sequence(futs), Duration.Inf).toMap
  }
}

object OdysseySim {

  /** Build, honouring the memory budget (in series). Returns Left(reason)
    * when the dataset would not fit the simulated cluster RAM.
    */
  def build(data: DataFrame, nSeries: Long, budgetSeries: Long,
            paaW: Int = 32): Either[String, OdysseySim] = {
    if (nSeries > budgetSeries)
      Left(s"dataset of $nSeries series exceeds the memory budget of $budgetSeries")
    else {
      val rows = data.select("id", "series").collect()
      val ids = rows.map(_.getLong(0))
      val ser = rows.map(_.getSeq[Double](1).toArray)
      Right(new OdysseySim(ids, ser, paaW))
    }
  }
}
