package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** Pivot set and P⁴ dual signature generation (CLIMBER-FX Step 2, §IV-B).
  *
  * Pivots are `r` PAA vectors selected uniformly at random from a sample of
  * the data (the paper opts for random selection, §V Step 1). Given the
  * pivots, a PAA vector's rank-sensitive signature `P⁴→` is the ordered list
  * of the ids of its `m` nearest pivots (ties broken by pivot id for
  * determinism), and the rank-insensitive `P⁴⇉` is the same set sorted by id.
  */
final case class PivotSet(vectors: Array[Array[Double]], prefixLen: Int) extends Serializable {
  require(prefixLen >= 1 && prefixLen <= vectors.length,
    s"prefix length $prefixLen must be in [1, ${vectors.length}]")

  def numPivots: Int = vectors.length

  /** Rank-sensitive signature (Def. 5/6): ids of the m nearest pivots,
    * closest first.
    */
  def rankSensitive(paa: Array[Double]): Array[Int] = {
    val r = vectors.length
    val d = new Array[Double](r)
    var i = 0
    while (i < r) { d(i) = Distances.squaredEuclidean(paa, vectors(i)); i += 1 }
    // Partial selection of the m smallest (distance, id) pairs.
    val idx = Array.tabulate(r)(identity)
    val ord = new Ordering[Int] {
      def compare(a: Int, b: Int): Int = {
        val c = java.lang.Double.compare(d(a), d(b))
        if (c != 0) c else Integer.compare(a, b)
      }
    }
    idx.sorted(ord).take(prefixLen)
  }

  /** Rank-insensitive signature (Def. 6): lexicographic (id) order. */
  def rankInsensitive(rs: Array[Int]): Array[Int] = {
    val out = rs.clone()
    java.util.Arrays.sort(out)
    out
  }

  /** Both signatures of a PAA vector. */
  def dual(paa: Array[Double]): (Array[Int], Array[Int]) = {
    val rs = rankSensitive(paa)
    (rs, rankInsensitive(rs))
  }
}

object Pivots {

  /** Select `r` random pivots (with prefix length `m`) from the PAA vectors
    * of a sample DataFrame with column `paaCol`. Deterministic in `seed`.
    */
  def select(sample: DataFrame, paaCol: String, r: Int, m: Int, seed: Long): PivotSet = {
    val rows = sample
      .select(paaCol)
      .orderBy(xxhash64(col(paaCol).cast("string"), lit(seed)))
      .limit(r)
      .collect()
      .map(_.getSeq[Double](0).toArray)
    require(rows.length > 0, "empty sample — cannot select pivots")
    PivotSet(rows, prefixLen = math.min(m, rows.length))
  }

  /** Attach signature columns to `df`: rs (array<int>) and ri (array<int>),
    * computed from `paaCol` with the broadcast pivot set.
    */
  def withSignatures(spark: SparkSession, df: DataFrame, paaCol: String,
                     pivots: PivotSet): DataFrame = {
    val bc = spark.sparkContext.broadcast(pivots)
    val sigUdf = udf { (paa: Seq[Double]) =>
      val (rs, ri) = bc.value.dual(paa.toArray)
      (rs, ri)
    }
    df.withColumn("_sig", sigUdf(col(paaCol)))
      .withColumn("rs", col("_sig._1"))
      .withColumn("ri", col("_sig._2"))
      .drop("_sig")
  }
}
