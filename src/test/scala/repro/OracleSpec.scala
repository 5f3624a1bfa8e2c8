package repro

import org.apache.spark.sql.functions._

/** Exercises the provided DuckDB oracle on the provided TPC-H-lite
  * generators plus CLIMBER's signature-frequency aggregation (the Step-2
  * input of Figure 6), so a broken groupBy/count path cannot silently
  * corrupt centroid selection.
  */
class OracleSpec extends SparkSpec {

  test("lineitem aggregation agrees between Spark and DuckDB") {
    val li = SynthData.lineitem(spark, sf = 0.001)
    val got = li.groupBy("l_returnflag")
      .agg(count(lit(1)).as("cnt"), round(sum("l_quantity"), 2).as("qty"))
    Oracle.assertEquivalent(
      got,
      """SELECT l_returnflag, COUNT(*) AS cnt,
        |       ROUND(SUM(CAST(l_quantity AS DOUBLE)), 2) AS qty
        |FROM lineitem GROUP BY l_returnflag""".stripMargin,
      "lineitem" -> li)
  }

  test("orders/customer join agrees between Spark and DuckDB") {
    val o = SynthData.orders(spark, sf = 0.002)
    val c = SynthData.customer(spark, sf = 0.002)
    val got = o.join(c, o("o_custkey") === c("c_custkey"))
      .groupBy("c_mktsegment").agg(count(lit(1)).as("cnt"))
    Oracle.assertEquivalent(
      got,
      """SELECT c_mktsegment, COUNT(*) AS cnt
        |FROM orders o JOIN customer c ON CAST(o.o_custkey AS BIGINT) = CAST(c.c_custkey AS BIGINT)
        |GROUP BY c_mktsegment""".stripMargin,
      "orders" -> o, "customer" -> c)
  }

  test("signature frequency aggregation agrees with DuckDB (Fig. 6 Step 2)") {
    import spark.implicits._
    val rng = new java.util.Random(3)
    val sigs = (1 to 300).map { i =>
      val s = Array.fill(4)(rng.nextInt(6)).sorted
      (i.toLong, s.mkString("<", ",", ">"))
    }.toDF("id", "sig")
    val got = sigs.groupBy("sig").agg(count(lit(1)).as("freq"))
    Oracle.assertEquivalent(
      got,
      "SELECT sig, COUNT(*) AS freq FROM sigs GROUP BY sig",
      "sigs" -> sigs)
  }

  test("recall-style set intersection agrees with DuckDB") {
    import spark.implicits._
    val approx = Seq(1L, 2L, 3L, 4L, 5L).toDF("id")
    val exact = Seq(2L, 4L, 6L, 8L, 10L).toDF("id")
    val got = approx.join(exact, "id").agg(count(lit(1)).as("hits"))
    Oracle.assertEquivalent(
      got,
      """SELECT COUNT(*) AS hits FROM approx a JOIN exact e
        |ON CAST(a.id AS BIGINT) = CAST(e.id AS BIGINT)""".stripMargin,
      "approx" -> approx, "exact" -> exact)
  }
}
