package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.core.Centroids.SigFreq
import repro.core.Distances.{Decay, ExpDecay}

/** Configuration of CLIMBER (defaults follow §VII-A where the paper gives
  * them: r = 200 pivots, prefix length m = 10; see DESIGN.md §6 for the
  * bench-scale choices of the rest).
  */
final case class ClimberParams(
    paaW: Int = 32,
    numPivots: Int = 200,
    prefixLen: Int = 10,
    alpha: Double = 0.1, // sample fraction for skeleton construction
    capacity: Long = 1000, // partition capacity c, in records
    epsilon: Int = -1, // centroid separation; -1 → prefixLen/2
    decay: Decay = ExpDecay(0.5),
    maxCentroids: Int = Int.MaxValue,
    seed: Long = 7,
) {
  def eps: Int = if (epsilon >= 0) epsilon else math.max(1, prefixLen / 2)
}

/** Wall-clock breakdown of index construction (Figure 10(a) phases). */
final case class BuildStats(
    skeletonSec: Double, // Steps 1-3: sampling + signatures + skeleton
    redistributeSec: Double, // Step 4: full-dataset conversion + re-distribution
    totalSec: Double,
    numGroups: Int,
    numPartitions: Int,
    skeletonBytes: Long,
)

/** A fully built CLIMBER index: the broadcastable skeleton, the pivot set,
  * and the re-distributed dataset with columns
  * (id: long, series: array<double>, rs: array<int>, group: int, part: int).
  */
final case class ClimberIndex(
    params: ClimberParams,
    pivots: PivotSet,
    skeleton: IndexSkeleton,
    data: DataFrame,
    stats: BuildStats,
)

object ClimberIndex {

  /** Java-serialised size of an index structure (the paper's "global index
    * size" metric of Figure 8(b)).
    */
  def serializedBytes(o: AnyRef): Long = {
    val bos = new java.io.ByteArrayOutputStream()
    val oos = new java.io.ObjectOutputStream(bos)
    oos.writeObject(o); oos.close()
    bos.size().toLong
  }

  private def aggSigs(df: DataFrame, col0: String): Seq[SigFreq] =
    df.groupBy(col(col0)).count().collect().toSeq
      .map(r => SigFreq(r.getSeq[Int](0).toArray, r.getLong(1)))

  /** Build the index over `df` (columns: id long, series array<double>)
    * following the four steps of Figure 6.
    */
  def build(spark: SparkSession, df: DataFrame, params: ClimberParams): ClimberIndex = {
    val t0 = System.nanoTime()
    val paa = Paa.paaUdf(params.paaW)

    // Steps 1-2: sample, PAA, pivots, dual signatures, frequency aggregation.
    val sample = df.sample(withReplacement = false, params.alpha, params.seed)
      .withColumn("paa", paa(col("series")))
      .cache()
    val pivots = Pivots.select(sample, "paa", params.numPivots, params.prefixLen, params.seed)
    val sampleSigs = Pivots.withSignatures(spark, sample, "paa", pivots)
      .select("rs", "ri").cache()
    val rsAgg = aggSigs(sampleSigs, "rs")
    val riAgg = aggSigs(sampleSigs, "ri")
    sampleSigs.unpersist(); sample.unpersist()

    // Step 3: centroids, groups, tries, FFD packing → index skeleton.
    val skeleton = IndexSkeleton.build(riAgg, rsAgg, params.alpha, params.capacity,
      params.eps, params.decay, params.maxCentroids)
    val t1 = System.nanoTime()

    // Step 4: broadcast pivots + skeleton, re-distribute the full dataset.
    val bcPivots = spark.sparkContext.broadcast(pivots)
    val bcSkel = spark.sparkContext.broadcast(skeleton)
    val placeUdf = udf { (id: Long, series: Seq[Double]) =>
      val p = bcPivots.value
      val paaV = Paa.of(series.toArray, params.paaW)
      val (rs, ri) = p.dual(paaV)
      val (g, part) = bcSkel.value.place(id, rs, ri)
      (rs, g, part)
    }
    val data = df
      .withColumn("_p", placeUdf(col("id"), col("series")))
      .select(col("id"), col("series"),
        col("_p._1").as("rs"), col("_p._2").as("group"), col("_p._3").as("part"))
      .repartition(col("part"))
      .cache()
    data.count() // force the re-distribution so timings are honest
    val t2 = System.nanoTime()

    val stats = BuildStats(
      skeletonSec = (t1 - t0) / 1e9,
      redistributeSec = (t2 - t1) / 1e9,
      totalSec = (t2 - t0) / 1e9,
      numGroups = skeleton.groups.size,
      numPartitions = skeleton.numPartitions,
      skeletonBytes = serializedBytes(skeleton),
    )
    ClimberIndex(params, pivots, skeleton, data, stats)
  }
}
