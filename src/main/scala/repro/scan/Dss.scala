package repro.scan

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._
import repro.core.Distances

/** Distributed Sequential Scan (§VII-A): the brute-force exact kNN baseline
  * that scans every partition in parallel. Used both as a baseline and as
  * the ground-truth generator for the recall metric (Def. 4).
  */
object Dss {

  /** Exact kNN of one query: full ED scan + top-K. Deterministic
    * (distance, id) ordering so ties never make recall flaky.
    */
  def knn(data: DataFrame, query: Array[Double], k: Int): Seq[(Long, Double)] = {
    val ed = udf { (xs: Seq[Double]) => Distances.euclidean(xs.toArray, query) }
    data.select(col("id"), ed(col("series")).as("dist"))
      .orderBy(col("dist"), col("id"))
      .limit(k)
      .collect()
      .map(r => (r.getLong(0), r.getDouble(1)))
      .toSeq
  }

  /** Exact kNN for a batch of queries in a single pass: broadcast the query
    * set, compute every (query, record) ED, and rank per query with a
    * window. Returns qid → top-K record ids (closest first).
    */
  def knnBatch(spark: SparkSession, data: DataFrame,
               queries: Seq[(Long, Array[Double])], k: Int): Map[Long, Seq[Long]] = {
    import spark.implicits._
    val qDf = queries.map { case (qid, s) => (qid, s) }.toDF("qid", "qseries")
    val ed = udf { (xs: Seq[Double], qs: Seq[Double]) =>
      Distances.euclidean(xs.toArray, qs.toArray)
    }
    val w = Window.partitionBy("qid").orderBy(col("dist"), col("id"))
    data
      .crossJoin(broadcast(qDf))
      .select(col("qid"), col("id"), ed(col("series"), col("qseries")).as("dist"))
      .withColumn("rn", row_number().over(w))
      .filter(col("rn") <= k)
      .select("qid", "id", "rn")
      .collect()
      .groupBy(_.getLong(0))
      .map { case (qid, rows) =>
        qid -> rows.sortBy(_.getInt(2)).map(_.getLong(1)).toSeq
      }
  }
}
