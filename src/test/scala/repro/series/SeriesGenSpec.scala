package repro.series

import repro.SparkSpec

class SeriesGenSpec extends SparkSpec {

  test("datasets registry matches the paper's lengths") {
    assert(SeriesGen.Lengths == Map("RandomWalk" -> 256, "SIFT" -> 128, "DNA" -> 192, "EEG" -> 256))
    assert(SeriesGen.Datasets.toSet == SeriesGen.Lengths.keySet)
  }

  test("local generation is deterministic in (dataset, id, seed)") {
    for (ds <- SeriesGen.Datasets) {
      val a = SeriesGen.local(ds, 42L, 7)
      val b = SeriesGen.local(ds, 42L, 7)
      assert(a.toSeq == b.toSeq, ds)
    }
  }

  test("different ids give different series") {
    for (ds <- SeriesGen.Datasets)
      assert(SeriesGen.local(ds, 1L, 7).toSeq != SeriesGen.local(ds, 2L, 7).toSeq, ds)
  }

  test("different seeds give different series") {
    for (ds <- SeriesGen.Datasets)
      assert(SeriesGen.local(ds, 1L, 7).toSeq != SeriesGen.local(ds, 1L, 8).toSeq, ds)
  }

  test("every series is z-normalised (mean 0, stddev 1)") {
    for (ds <- SeriesGen.Datasets; id <- 0L until 20L) {
      val xs = SeriesGen.local(ds, id, 3)
      val mean = xs.sum / xs.length
      val sd = math.sqrt(xs.map(v => (v - mean) * (v - mean)).sum / xs.length)
      assert(math.abs(mean) < 1e-9, s"$ds/$id mean $mean")
      assert(math.abs(sd - 1.0) < 1e-9, s"$ds/$id sd $sd")
    }
  }

  test("znorm of a constant series is all zeros") {
    assert(SeriesGen.znorm(Array.fill(8)(5.0)).toSeq == Seq.fill(8)(0.0))
  }

  test("znorm known example") {
    val z = SeriesGen.znorm(Array(0.0, 2.0))
    assert(z.toSeq == Seq(-1.0, 1.0))
  }

  test("series lengths match the registry") {
    for (ds <- SeriesGen.Datasets)
      assert(SeriesGen.local(ds, 0L, 1).length == SeriesGen.Lengths(ds), ds)
  }

  test("random walks have long-range temporal correlation, EEG-like stays oscillatory") {
    // Lag-1 autocorrelation of a (z-normed) random walk is near 1; white
    // noise would be near 0.
    def lag1(xs: Array[Double]): Double =
      xs.dropRight(1).zip(xs.drop(1)).map { case (a, b) => a * b }.sum / xs.length
    val walks = (0L until 20L).map(id => lag1(SeriesGen.local("RandomWalk", id, 5)))
    assert(walks.sum / walks.size > 0.8)
  }

  test("SIFT surrogate is clustered: same-cluster pairs are closer on average") {
    // Some pairs among 200 ids share a latent cluster (64 clusters), so the
    // minimum pairwise distance is far below the mean pairwise distance.
    val xs = (0L until 100L).map(SeriesGen.local("SIFT", _, 5))
    val ds = for (i <- xs.indices; j <- xs.indices if i < j)
      yield repro.core.Distances.euclidean(xs(i), xs(j))
    assert(ds.min < 0.5 * (ds.sum / ds.size))
  }

  test("DNA surrogate steps are bounded before normalisation (walk-like)") {
    val xs = SeriesGen.local("DNA", 3L, 5)
    // A z-normed walk has bounded increments relative to its range.
    val incr = xs.dropRight(1).zip(xs.drop(1)).map { case (a, b) => math.abs(b - a) }
    assert(incr.max < (xs.max - xs.min) / 2)
  }

  test("DataFrame generation matches local generation row by row") {
    for (ds <- SeriesGen.Datasets) {
      val rows = SeriesGen.generate(spark, ds, 30, seed = 11).collect()
      assert(rows.length == 30)
      rows.foreach { r =>
        assert(r.getSeq[Double](1).toSeq == SeriesGen.local(ds, r.getLong(0), 11).toSeq, ds)
      }
    }
  }

  test("generate rejects unknown dataset names") {
    intercept[IllegalArgumentException](SeriesGen.generate(spark, "Nope", 10))
    intercept[IllegalArgumentException](SeriesGen.local("Nope", 1L, 1))
  }

  test("EEG spikes are rare: most series have max below the spike scale") {
    val maxes = (0L until 50L).map(id => SeriesGen.local("EEG", id, 5).max)
    assert(maxes.count(_ > 4.0) < 25)
  }
}
