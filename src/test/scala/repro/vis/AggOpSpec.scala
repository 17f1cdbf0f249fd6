package repro.vis

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}

class AggOpSpec extends SparkSpec {

  private val xs = Array(1.0, 2.0, 3.0, 4.0, 5.0, 6.0, 7.0)

  test("avg over tumbling windows") {
    assert(AggOp.aggregate(xs, AggOp.Avg, 2).toSeq == Seq(1.5, 3.5, 5.5))
  }

  test("sum over tumbling windows") {
    assert(AggOp.aggregate(xs, AggOp.Sum, 3).toSeq == Seq(6.0, 15.0))
  }

  test("max over tumbling windows") {
    assert(AggOp.aggregate(xs, AggOp.Max, 2).toSeq == Seq(2.0, 4.0, 6.0))
  }

  test("min over tumbling windows") {
    assert(AggOp.aggregate(xs, AggOp.Min, 2).toSeq == Seq(1.0, 3.0, 5.0))
  }

  test("window of 1 is the identity (fresh copy)") {
    val out = AggOp.aggregate(xs, AggOp.Sum, 1)
    assert(out.toSeq == xs.toSeq)
    assert(!(out eq xs))
  }

  test("trailing partial windows are dropped") {
    assert(AggOp.aggregate(xs, AggOp.Avg, 4).length == 1)
    assert(AggOp.aggregate(Array(1.0, 2.0), AggOp.Avg, 3).isEmpty)
  }

  test("invalid window is rejected") {
    intercept[IllegalArgumentException](AggOp.aggregate(xs, AggOp.Avg, 0))
  }

  test("operator ids and lookup are consistent") {
    AggOp.all.foreach(op => assert(AggOp.byId(op.id) eq op))
    assert(AggOp.all.map(_.id).toSeq == Seq(1, 2, 3, 4))
    assert(AggOp.all.map(_.name).toSeq == Seq("avg", "sum", "max", "min"))
  }

  test("aggregate matches the equivalent Spark SQL tumbling query and DuckDB") {
    val sp = spark
    import sp.implicits._
    val n  = 96
    val w  = 8
    val data = Array.tabulate(n)(i => (i, math.sin(i / 5.0) * 10 + i * 0.25))
    val df = data.toSeq.toDF("idx", "v")
    val sparkAgg = df
      .groupBy((floor($"idx" / w) * w).cast("long").as("bucket"))
      .agg(
        round(avg($"v"), 6).as("a"),
        round(sum($"v"), 6).as("s"),
        round(max($"v"), 6).as("mx"),
        round(min($"v"), 6).as("mn")
      )
      .orderBy($"bucket")

    // Spark vs DuckDB (the Oracle): same SQL over the same input rows.
    Oracle.assertEquivalent(
      sparkAgg,
      s"""SELECT (CAST(idx AS BIGINT) // $w) * $w AS bucket,
         |       ROUND(AVG(CAST(v AS DOUBLE)), 6) AS a,
         |       ROUND(SUM(CAST(v AS DOUBLE)), 6) AS s,
         |       ROUND(MAX(CAST(v AS DOUBLE)), 6) AS mx,
         |       ROUND(MIN(CAST(v AS DOUBLE)), 6) AS mn
         |FROM t GROUP BY bucket ORDER BY bucket""".stripMargin,
      "t" -> df
    )

    // Spark vs the in-process AggOp kernel.
    val values = data.map(_._2)
    val rows   = sparkAgg.collect()
    val byOp = Map(
      "a"  -> AggOp.aggregate(values, AggOp.Avg, w),
      "s"  -> AggOp.aggregate(values, AggOp.Sum, w),
      "mx" -> AggOp.aggregate(values, AggOp.Max, w),
      "mn" -> AggOp.aggregate(values, AggOp.Min, w)
    )
    for ((col, expected) <- byOp; i <- expected.indices) {
      val got = rows(i).getAs[Double](col)
      assert(math.abs(got - expected(i)) < 1e-5, s"$col bucket $i")
    }
  }
}
