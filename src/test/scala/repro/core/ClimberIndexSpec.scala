package repro.core

import org.apache.spark.sql.functions._
import repro.SparkSpec
import repro.series.SeriesGen

class ClimberIndexSpec extends SparkSpec {

  private val params = ClimberParams(paaW = 16, numPivots = 24, prefixLen = 4,
    alpha = 0.3, capacity = 200, seed = 7)
  private lazy val df = SeriesGen.generate(spark, "RandomWalk", 2000, seed = 1).cache()
  private lazy val index = ClimberIndex.build(spark, df, params)

  test("every record is assigned to exactly one group and partition") {
    assert(index.data.count() == 2000)
    assert(index.data.filter(col("group").isNull || col("part").isNull).count() == 0)
  }

  test("assigned partitions are within the skeleton's partition range") {
    val parts = index.data.select("part").distinct().collect().map(_.getInt(0))
    assert(parts.forall(p => p >= 0 && p < index.skeleton.numPartitions))
  }

  test("assigned groups exist in the skeleton") {
    val gs = index.data.select("group").distinct().collect().map(_.getInt(0))
    assert(gs.forall(g => g >= 0 && g < index.skeleton.groups.size))
  }

  test("record partitions belong to the record's group") {
    val rows = index.data.select("group", "part").distinct().collect()
    rows.foreach { r =>
      val g = index.skeleton.groups(r.getInt(0))
      assert((g.root.partitions :+ g.defaultPartition).contains(r.getInt(1)))
    }
  }

  test("the skeleton produces more than one group on clustered-ish data") {
    assert(index.skeleton.groups.size > 2)
  }

  test("the fall-back group G0 holds few records") {
    val g0 = index.data.filter(col("group") === 0).count()
    assert(g0 < 2000 * 0.2, s"G0 unexpectedly large: $g0")
  }

  test("stored rs column matches a local recomputation") {
    val rows = index.data.select("id", "rs").limit(50).collect()
    rows.foreach { r =>
      val paa = Paa.of(SeriesGen.local("RandomWalk", r.getLong(0), 1), params.paaW)
      assert(r.getSeq[Int](1).toSeq == index.pivots.rankSensitive(paa).toSeq)
    }
  }

  test("placement in the DataFrame agrees with driver-side place()") {
    val rows = index.data.select("id", "rs", "group", "part").limit(100).collect()
    rows.foreach { r =>
      val rs = r.getSeq[Int](1).toArray
      val ri = rs.clone().sorted
      val (g, p) = index.skeleton.place(r.getLong(0), rs, ri)
      assert(g == r.getInt(2) && p == r.getInt(3))
    }
  }

  test("build is deterministic in the seed") {
    val again = ClimberIndex.build(spark, df, params)
    assert(again.skeleton.numPartitions == index.skeleton.numPartitions)
    assert(again.skeleton.groups.size == index.skeleton.groups.size)
    val a = index.data.select("id", "group", "part").collect().map(r => (r.getLong(0), r.getInt(1), r.getInt(2))).sortBy(_._1)
    val b = again.data.select("id", "group", "part").collect().map(r => (r.getLong(0), r.getInt(1), r.getInt(2))).sortBy(_._1)
    assert(a.toSeq == b.toSeq)
    again.data.unpersist()
  }

  test("partition sizes respect the soft capacity within a sampling factor") {
    val sizes = index.data.groupBy("part").count().collect().map(_.getLong(1))
    // c is a soft constraint estimated from a sample (§V Step 3); allow slack.
    assert(sizes.max <= params.capacity * 6, s"max partition ${sizes.max}")
  }

  test("build stats are populated and consistent") {
    val s = index.stats
    assert(s.totalSec >= s.skeletonSec && s.totalSec >= s.redistributeSec)
    assert(s.numGroups == index.skeleton.groups.size)
    assert(s.numPartitions == index.skeleton.numPartitions)
    assert(s.skeletonBytes > 0)
  }

  test("the skeleton is small relative to the data (global-index property)") {
    // Paper Fig. 8(b): the global index is tiny (MBs for TBs of data).
    assert(index.stats.skeletonBytes < 5 * 1024 * 1024)
  }

  test("pivot count and prefix length follow the parameters") {
    assert(index.pivots.numPivots == params.numPivots)
    assert(index.pivots.prefixLen == params.prefixLen)
  }
}
