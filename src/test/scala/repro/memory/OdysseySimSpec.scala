package repro.memory

import repro.SparkSpec
import repro.scan.Dss
import repro.series.SeriesGen

class OdysseySimSpec extends SparkSpec {

  private lazy val df = SeriesGen.generate(spark, "RandomWalk", 800, seed = 9).cache()
  private lazy val ody = OdysseySim.build(df, 800, Long.MaxValue, paaW = 16).toOption.get

  test("build refuses datasets beyond the memory budget (the Table I 'X')") {
    val r = OdysseySim.build(df, nSeries = 800, budgetSeries = 500, paaW = 16)
    assert(r.isLeft)
    assert(r.left.toOption.get.contains("budget"))
  }

  test("build succeeds within the budget") {
    assert(OdysseySim.build(df, 800, 800, 16).isRight)
  }

  test("Odyssey is exact: results equal Dss for several queries") {
    for (qid <- Seq(0L, 123L, 700L)) {
      val q = SeriesGen.local("RandomWalk", qid, 9)
      val got = ody.knn(q, 25)
      val exp = Dss.knn(df, q, 25)
      assert(got.map(_._1) == exp.map(_._1), s"query $qid")
    }
  }

  test("recall of the exact engine is 1.0 by construction") {
    val qs = Seq(5L, 50L).map(id => (id, SeriesGen.local("RandomWalk", id, 9)))
    val truth = Dss.knnBatch(spark, df, qs, 30)
    val batch = ody.knnBatch(qs, 30)
    qs.foreach { case (qid, _) =>
      assert(repro.exp.Workloads.recall(batch(qid).map(_._1), truth(qid)) == 1.0)
    }
  }

  test("lower-bound pruning actually skips ED computations") {
    val q = SeriesGen.local("RandomWalk", 10L, 9)
    ody.knn(q, 5)
    assert(ody.lastScanned < 800, s"scanned ${ody.lastScanned} of 800 — no pruning")
  }

  test("pruning never sacrifices exactness at any k") {
    val q = SeriesGen.local("RandomWalk", 321L, 9)
    for (k <- Seq(1, 10, 100)) {
      assert(ody.knn(q, k).map(_._1) == Dss.knn(df, q, k).map(_._1))
    }
  }

  test("results are sorted by (distance, id)") {
    val q = SeriesGen.local("RandomWalk", 64L, 9)
    val res = ody.knn(q, 40)
    assert(res == res.sortBy { case (id, d) => (d, id) })
  }

  test("batch results match single-query results") {
    val qs = Seq(2L, 4L).map(id => (id, SeriesGen.local("RandomWalk", id, 9)))
    val batch = ody.knnBatch(qs, 10)
    qs.foreach { case (qid, q) => assert(batch(qid) == ody.knn(q, 10)) }
  }
}
