package repro.exp

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.series.SeriesGen

/** Shared workload plumbing for the benches/jobs: dataset materialisation,
  * query sampling (queries are drawn from the dataset itself, §VII-A),
  * recall (Def. 4), and timing helpers.
  */
object Workloads {

  /** Scale mapping documented in DESIGN.md §2: 1 paper-"GB" ≡ 250 series. */
  val SeriesPerGb: Int = 250

  /** Bench-scale CLIMBER parameters: the paper's defaults (r = 200 pivots,
    * prefix m = 10, §VII-A), with the capacity c = 2000 records standing in
    * for a fixed 128 MB HDFS partition (DESIGN.md §6). A calibration sweep
    * (jobs/ProbeJob) confirmed r = 200/m = 10 dominates or ties the smaller
    * settings across all four datasets at this scale.
    */
  val benchParams: repro.core.ClimberParams =
    repro.core.ClimberParams(numPivots = 200, prefixLen = 10, capacity = 2000)

  val DataSeed = 42L

  /** Cached DataFrame of `n` series of the named dataset. */
  def dataset(spark: SparkSession, name: String, n: Long): DataFrame = {
    val df = SeriesGen.generate(spark, name, n, DataSeed).cache()
    df.count()
    df
  }

  /** `q` query series drawn deterministically from the dataset's id space.
    * Because generation is deterministic in (id, seed), the query series
    * are regenerated locally — no Spark lookup needed — and are bitwise
    * equal to the stored rows.
    */
  def queries(name: String, n: Long, q: Int, seed: Long = 77): Seq[(Long, Array[Double])] = {
    val rng = new java.util.Random(seed)
    val ids = scala.collection.mutable.LinkedHashSet[Long]()
    while (ids.size < q) ids += math.floorMod(rng.nextLong(), n)
    ids.toSeq.map(id => (id, SeriesGen.local(name, id, DataSeed)))
  }

  /** Recall (Def. 4): |approx ∩ exact| / |exact|. */
  def recall(approx: Seq[Long], exact: Seq[Long]): Double =
    if (exact.isEmpty) 1.0
    else approx.toSet.intersect(exact.toSet).size.toDouble / exact.size

  /** Mean recall of a per-query result map against the ground truth. */
  def meanRecall(results: Map[Long, Seq[Long]], truth: Map[Long, Seq[Long]]): Double = {
    val rs = truth.keys.toSeq.map(qid => recall(results.getOrElse(qid, Seq.empty), truth(qid)))
    rs.sum / rs.size
  }

  /** Wall-clock a thunk: (result, seconds). */
  def timed[T](f: => T): (T, Double) = {
    val t0 = System.nanoTime()
    val r = f
    (r, (System.nanoTime() - t0) / 1e9)
  }

  /** Render rows as a fixed-width table (bench/job output). */
  def table(header: Seq[String], rows: Seq[Seq[String]]): String = {
    val all = header +: rows
    val widths = header.indices.map(i => all.map(_(i).length).max)
    def fmt(r: Seq[String]) = r.zip(widths).map { case (c, w) => c.padTo(w, ' ') }.mkString("  ")
    (fmt(header) +: widths.map("-" * _).mkString("  ") +: rows.map(fmt)).mkString("\n")
  }
}
