package repro.core

import org.apache.spark.sql.functions._
import repro.SparkSpec
import repro.series.SeriesGen

class PaaSpec extends SparkSpec {

  test("PAA of a constant series is constant") {
    val xs = Array.fill(16)(3.5)
    assert(Paa.of(xs, 4).toSeq == Seq.fill(4)(3.5))
  }

  test("PAA reduces length n to w") {
    assert(Paa.of(Array.tabulate(12)(_.toDouble), 4).length == 4)
  }

  test("PAA with w == n is the identity") {
    val xs = Array(1.0, -2.0, 3.0, 0.5)
    assert(Paa.of(xs, 4).toSeq == xs.toSeq)
  }

  test("PAA with w == 1 is the global mean") {
    val xs = Array(1.0, 2.0, 3.0, 6.0)
    assert(Paa.of(xs, 1).toSeq == Seq(3.0))
  }

  test("paper Figure 3 example: n=12 → w=4 segment means") {
    // Each segment of 3 values is replaced by its mean.
    val xs = Array(1.0, 2.0, 3.0, /**/ 4.0, 4.0, 4.0, /**/ -1.0, 0.0, 1.0, /**/ 2.0, 2.0, 5.0)
    assert(Paa.of(xs, 4).toSeq == Seq(2.0, 4.0, 0.0, 3.0))
  }

  test("PAA rejects w that does not divide n") {
    intercept[IllegalArgumentException](Paa.of(Array.fill(10)(1.0), 3))
  }

  test("PAA rejects w = 0") {
    intercept[IllegalArgumentException](Paa.of(Array.fill(10)(1.0), 0))
  }

  test("PAA is linear: paa(aX + bY) = a·paa(X) + b·paa(Y)") {
    val rng = new java.util.Random(1)
    val x = Array.fill(32)(rng.nextGaussian())
    val y = Array.fill(32)(rng.nextGaussian())
    val lhs = Paa.of(x.zip(y).map { case (a, b) => 2.0 * a - 3.0 * b }, 8)
    val rhs = Paa.of(x, 8).zip(Paa.of(y, 8)).map { case (a, b) => 2.0 * a - 3.0 * b }
    lhs.zip(rhs).foreach { case (a, b) => assert(math.abs(a - b) < 1e-12) }
  }

  test("PAA preserves the mean of the series") {
    val rng = new java.util.Random(2)
    for (_ <- 1 to 20) {
      val xs = Array.fill(64)(rng.nextGaussian())
      assert(math.abs(Paa.of(xs, 8).sum / 8 - xs.sum / 64) < 1e-12)
    }
  }

  test("PAA lower bound property: sqrt(n/w)·||paaX − paaY|| ≤ ED(X, Y)") {
    val rng = new java.util.Random(3)
    for (_ <- 1 to 50) {
      val x = Array.fill(64)(rng.nextGaussian())
      val y = Array.fill(64)(rng.nextGaussian())
      val lb = Distances.paaLowerBound(Paa.of(x, 8), Paa.of(y, 8), 64)
      assert(lb <= Distances.euclidean(x, y) + 1e-9)
    }
  }

  test("PAA UDF matches the local implementation") {
    val df = SeriesGen.generate(spark, "RandomWalk", 50, seed = 5)
    val w = 32
    val got = df.select(col("id"), Paa.paaUdf(w)(col("series")).as("paa")).collect()
    got.foreach { r =>
      val id = r.getLong(0)
      val expected = Paa.of(SeriesGen.local("RandomWalk", id, 5), w)
      val actual = r.getSeq[Double](1).toArray
      expected.zip(actual).foreach { case (a, b) => assert(math.abs(a - b) < 1e-12) }
    }
  }

  test("PAA mean values agree with a DuckDB SQL formulation (oracle)") {
    import spark.implicits._
    val n = 16; val w = 4; val rows = 20
    val raw = (0 until rows).flatMap { id =>
      val xs = SeriesGen.randomWalkLocal(id.toLong, n, 9)
      xs.zipWithIndex.map { case (v, pos) => (id.toLong, pos, v) }
    }.toDF("id", "pos", "v")
    val sparkPaa = raw
      .withColumn("seg", (col("pos") / (n / w)).cast("int"))
      .groupBy("id", "seg").agg(avg("v").as("paaval"))
      .select("id", "seg", "paaval")
    repro.Oracle.assertEquivalent(
      sparkPaa,
      s"""SELECT CAST(id AS BIGINT) AS id,
         |       CAST(CAST(pos AS INT) // ${n / w} AS INT) AS seg,
         |       AVG(CAST(v AS DOUBLE)) AS paaval
         |FROM raw GROUP BY 1, 2""".stripMargin,
      "raw" -> raw)
  }
}
