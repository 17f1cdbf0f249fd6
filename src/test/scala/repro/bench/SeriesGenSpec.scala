package repro.bench

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}

import scala.util.Random

class SeriesGenSpec extends SparkSpec {

  test("parametric families are deterministic in the rng seed") {
    for (f <- 0 until SeriesGen.NFamilies) {
      val a = SeriesGen.gen(new Random(9), f, 64, 10.0, 5.0)
      val b = SeriesGen.gen(new Random(9), f, 64, 10.0, 5.0)
      assert(a.toSeq == b.toSeq, s"family $f")
    }
  }

  test("families produce the requested length") {
    for (f <- 0 until SeriesGen.NFamilies) {
      assert(SeriesGen.gen(new Random(1), f, 100, 1.0, 0.0).length == 100)
    }
  }

  test("scale and offset move the series as expected") {
    val small = SeriesGen.gen(new Random(3), 0, 128, 1.0, 0.0)
    val big   = SeriesGen.gen(new Random(3), 0, 128, 1000.0, 0.0)
    assert((big.max - big.min) > 100 * (small.max - small.min))
    val shifted = SeriesGen.gen(new Random(3), 2, 128, 1.0, 500.0)
    assert(shifted.sum / shifted.length > 400)
  }

  test("steps family is piecewise flat (few distinct levels)") {
    val s = SeriesGen.gen(new Random(4), 3, 200, 1.0, 0.0)
    // regime noise is small relative to level jumps
    val diffs = s.sliding(2).map(p => math.abs(p(1) - p(0))).toArray
    val bigJumps = diffs.count(_ > 0.5)
    assert(bigJumps < 40)
  }

  test("unknown family is rejected") {
    intercept[IllegalArgumentException](SeriesGen.gen(new Random(1), 99, 10, 1.0, 0.0))
  }

  test("TPC-H daily aggregates match DuckDB (Oracle)") {
    // Exact, summation-order-independent aggregates only: sum/avg over
    // doubles can differ between engines at the last ulp and flip a
    // rounding boundary, which is not a correctness signal.
    val lineitem = repro.SynthData.lineitem(spark, 0.001)
    val df = lineitem
      .groupBy(col("l_shipdate"))
      .agg(
        count(lit(1)).cast("long").as("cnt"),
        min(col("l_quantity")).as("qty_min"),
        max(col("l_extendedprice")).as("price_max")
      )
    Oracle.assertEquivalent(
      df,
      """SELECT l_shipdate,
        |       COUNT(*) AS cnt,
        |       MIN(CAST(l_quantity AS DOUBLE)) AS qty_min,
        |       MAX(CAST(l_extendedprice AS DOUBLE)) AS price_max
        |FROM lineitem GROUP BY l_shipdate""".stripMargin,
      "lineitem" -> lineitem
    )
    // The sum/avg series that feed the pool are checked in-process instead.
    val daily = SeriesGen.tpchDailyDF(spark, sf = 0.001).collect()
    assert(daily.length > 2000)
    daily.foreach { r =>
      assert(r.getDouble(1) > 0.0)  // qty_sum
      assert(r.getDouble(2) > 0.0)  // price_avg
      assert(r.getDouble(3) >= 1.0) // cnt
    }
  }

  test("tpchPool yields usable slices") {
    val pool = SeriesGen.tpchPool(spark, sf = 0.001, sliceLen = 256)
    assert(pool.nonEmpty)
    pool.foreach(s => assert(s.length >= 128))
  }

  test("fromPool resamples and rescales deterministically") {
    val pool = Array(Array.tabulate(100)(i => math.sin(i / 5.0)))
    val a = SeriesGen.fromPool(new Random(5), pool, 64, 10.0, 3.0)
    val b = SeriesGen.fromPool(new Random(5), pool, 64, 10.0, 3.0)
    assert(a.toSeq == b.toSeq)
    assert(a.length == 64)
  }
}
