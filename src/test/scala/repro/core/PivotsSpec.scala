package repro.core

import org.apache.spark.sql.functions._
import repro.SparkSpec
import repro.series.SeriesGen

class PivotsSpec extends SparkSpec {

  private val vecs = Array(
    Array(0.0, 0.0), // pivot 0
    Array(1.0, 0.0), // pivot 1
    Array(0.0, 1.0), // pivot 2
    Array(5.0, 5.0), // pivot 3
  )

  test("rank-sensitive signature orders pivots by proximity (Def. 5)") {
    val ps = PivotSet(vecs, prefixLen = 3)
    assert(ps.rankSensitive(Array(0.1, 0.0)).toSeq == Seq(0, 1, 2))
    assert(ps.rankSensitive(Array(0.9, 0.0)).toSeq == Seq(1, 0, 2))
    assert(ps.rankSensitive(Array(4.0, 4.0)).toSeq == Seq(3, 1, 2))
  }

  test("rank-sensitive signature has exactly m entries") {
    for (m <- 1 to 4)
      assert(PivotSet(vecs, m).rankSensitive(Array(0.3, 0.7)).length == m)
  }

  test("rank-sensitive entries are distinct pivot ids") {
    val rs = PivotSet(vecs, 4).rankSensitive(Array(0.3, 0.7))
    assert(rs.distinct.length == rs.length)
    assert(rs.forall(p => p >= 0 && p < 4))
  }

  test("equidistant pivots are tie-broken by pivot id (determinism)") {
    val ps = PivotSet(vecs, 3)
    // (0.5, 0) is equidistant from pivots 0 and 1 → 0 first.
    assert(ps.rankSensitive(Array(0.5, 0.0)).take(2).toSeq == Seq(0, 1))
  }

  test("rank-insensitive signature is the id-sorted rank-sensitive set (Def. 6)") {
    val ps = PivotSet(vecs, 3)
    val (rs, ri) = ps.dual(Array(0.9, 0.0))
    assert(ri.toSeq == rs.sorted.toSeq)
    assert(ri.toSet == rs.toSet)
  }

  test("paper Figure 4: close objects share the rank-insensitive signature") {
    // Two points on either side of the bisector of pivots 0 and 1.
    val ps = PivotSet(vecs, 2)
    val (rsX, riX) = ps.dual(Array(0.45, 0.0))
    val (rsY, riY) = ps.dual(Array(0.55, 0.0))
    assert(rsX.toSeq != rsY.toSeq) // rank-sensitive differs (fine-grained)
    assert(riX.toSeq == riY.toSeq) // rank-insensitive agrees (coarse-grained)
  }

  test("PivotSet rejects prefix length out of range") {
    intercept[IllegalArgumentException](PivotSet(vecs, 0))
    intercept[IllegalArgumentException](PivotSet(vecs, 5))
  }

  test("select picks r distinct pivots deterministically in the seed") {
    val df = SeriesGen.generate(spark, "RandomWalk", 200, seed = 3)
      .withColumn("paa", Paa.paaUdf(16)(col("series")))
    val a = Pivots.select(df, "paa", 10, 4, seed = 1)
    val b = Pivots.select(df, "paa", 10, 4, seed = 1)
    val c = Pivots.select(df, "paa", 10, 4, seed = 2)
    assert(a.numPivots == 10 && a.prefixLen == 4)
    assert(a.vectors.map(_.toSeq).toSeq == b.vectors.map(_.toSeq).toSeq)
    assert(a.vectors.map(_.toSeq).toSeq != c.vectors.map(_.toSeq).toSeq)
  }

  test("select caps the prefix length at the pivot count") {
    val df = SeriesGen.generate(spark, "RandomWalk", 20, seed = 3)
      .withColumn("paa", Paa.paaUdf(16)(col("series")))
    assert(Pivots.select(df, "paa", 5, 10, seed = 1).prefixLen == 5)
  }

  test("withSignatures matches the local dual computation") {
    val df = SeriesGen.generate(spark, "RandomWalk", 100, seed = 4)
      .withColumn("paa", Paa.paaUdf(16)(col("series")))
    val ps = Pivots.select(df, "paa", 8, 3, seed = 1)
    val rows = Pivots.withSignatures(spark, df, "paa", ps)
      .select("id", "rs", "ri").collect()
    assert(rows.length == 100)
    rows.foreach { r =>
      val paa = Paa.of(SeriesGen.local("RandomWalk", r.getLong(0), 4), 16)
      val (rs, ri) = ps.dual(paa)
      assert(r.getSeq[Int](1).toSeq == rs.toSeq)
      assert(r.getSeq[Int](2).toSeq == ri.toSeq)
    }
  }

  test("nearest pivot of a pivot's own location is itself") {
    val ps = PivotSet(vecs, 1)
    for (i <- vecs.indices)
      assert(ps.rankSensitive(vecs(i)).head == i)
  }
}
