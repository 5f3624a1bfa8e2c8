package repro.isax

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.core.{ClimberIndex, Paa}

/** Shared machinery for the two iSAX baselines (DPiSAX, TARDIS): both build
  * a tiny global structure from a sample of iSAX words, broadcast it, route
  * every record to exactly one physical partition, and answer a query by
  * ED-scanning the single partition its word routes to (§VII-A: "the
  * baseline techniques are restricted to a single partition").
  */
trait WordRouter extends Serializable {
  def route(word: Array[Int]): Int
  def numPartitions: Int
}

/** A built baseline index: the router plus the re-distributed dataset with
  * columns (id, series, part).
  */
final case class BaselineIndex(
    name: String,
    paaW: Int,
    bits: Int,
    router: WordRouter,
    data: DataFrame,
    buildSec: Double,
    indexBytes: Long,
)

object BaselineCommon {

  /** iSAX word of a raw series at `2^bits` cardinality. */
  def wordOf(series: Array[Double], paaW: Int, bits: Int): Array[Int] =
    Isax.word(Paa.of(series, paaW), bits)

  /** Build a baseline index: sample → words → `mkRouter` → re-distribute. */
  def index(spark: SparkSession, df: DataFrame, name: String, paaW: Int, bits: Int,
            alpha: Double, seed: Long,
            mkRouter: Seq[(Array[Int], Long)] => WordRouter): BaselineIndex = {
    val t0 = System.nanoTime()
    val wordUdf = udf { (xs: Seq[Double]) => wordOf(xs.toArray, paaW, bits) }
    val sampleWords = df.sample(withReplacement = false, alpha, seed)
      .select(wordUdf(col("series")).as("word"))
      .groupBy("word").count()
      .collect()
      .map(r => (r.getSeq[Int](0).toArray, math.max(1L, math.round(r.getLong(1) / alpha))))
      .toSeq
    val router = mkRouter(sampleWords)
    val bc = spark.sparkContext.broadcast(router)
    val routeUdf = udf { (xs: Seq[Double]) => bc.value.route(wordOf(xs.toArray, paaW, bits)) }
    val data = df.select(col("id"), col("series"), routeUdf(col("series")).as("part"))
      .repartition(col("part"))
      .cache()
    data.count()
    val buildSec = (System.nanoTime() - t0) / 1e9
    BaselineIndex(name, paaW, bits, router, data, buildSec, ClimberIndex.serializedBytes(router))
  }

  /** Approximate kNN: route the query to its single partition and ED-rank
    * that partition's records.
    */
  def knn(index: BaselineIndex, query: Array[Double], k: Int): Seq[(Long, Double)] = {
    val part = index.router.route(wordOf(query, index.paaW, index.bits))
    repro.core.ClimberQuery.scanTopK(index.data, "part", Array(part), query, k)
  }
}
