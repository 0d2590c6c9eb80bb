package repro

import org.apache.spark.sql.functions._

/** Smoke coverage for the provided TPC-H-lite generators and the DuckDB
  * oracle plumbing itself (the image-corpus generators extend this module's
  * role for the SeeSaw reproduction).
  */
class SynthDataSpec extends SparkSpec {

  test("lineitem generates the expected row count at tiny SF") {
    assert(SynthData.lineitem(spark, sf = 0.0001).count() == 600)
  }

  test("orders keys are dense 1..N") {
    val df = SynthData.orders(spark, sf = 0.0001)
    val n = df.count()
    assert(n == 150)
    val minMax = df.agg(min("o_orderkey"), max("o_orderkey")).head()
    assert(minMax.getLong(0) == 1 && minMax.getLong(1) == n)
  }

  test("generators are deterministic in (sf, seed)") {
    val a = SynthData.customer(spark, sf = 0.001).collect().map(_.toString).sorted
    val b = SynthData.customer(spark, sf = 0.001).collect().map(_.toString).sorted
    assert(a.sameElements(b))
  }

  test("oracle: lineitem aggregate matches DuckDB") {
    val li = SynthData.lineitem(spark, sf = 0.0005)
    val agg = li.groupBy("l_returnflag")
      .agg(count(lit(1)).as("cnt"), round(sum("l_quantity"), 2).as("qty"))
    Oracle.assertEquivalent(
      agg,
      """SELECT l_returnflag, COUNT(*) AS cnt,
        |       ROUND(SUM(CAST(l_quantity AS DOUBLE)), 2) AS qty
        |FROM lineitem GROUP BY l_returnflag""".stripMargin,
      "lineitem" -> li,
    )
  }

  test("zipf keys are skewed, uniform keys are not") {
    val z = SynthData.zipfKeys(spark, 20000, 100).groupBy("k").count()
    val zTop = z.orderBy(desc("count")).head().getLong(1)
    val u = SynthData.uniformKeys(spark, 20000, 100).groupBy("k").count()
    val uTop = u.orderBy(desc("count")).head().getLong(1)
    assert(zTop > 3 * uTop, s"zipf top $zTop uniform top $uTop")
  }
}
