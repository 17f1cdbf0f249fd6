package repro.bench

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.SynthData

import scala.util.Random

/** Synthetic series families for the benchmark repository — the Plotly
  * corpus substitute (DESIGN.md §2). Five parametric families cover the
  * chart shapes common in the Plotly corpus (walks, trends/seasonality,
  * mean-reverting noise, regime steps, spiky series), plus a pool of
  * real-ish TPC-H-lite daily aggregate series produced with Spark SQL over
  * `repro.SynthData.lineitem`.
  */
object SeriesGen {

  /** Number of parametric families (ids 0..NFamilies-1). */
  val NFamilies = 5

  val FamilyNames: Array[String] =
    Array("walk", "trendSeason", "ar1", "steps", "spikes", "tpch")

  /** Generate one series of family `family` with `n` points at a value
    * scale/offset; deterministic in `rng`.
    */
  def gen(rng: Random, family: Int, n: Int, scale: Double, offset: Double): Array[Double] =
    family match {
      case 0 => // random walk
        val out = new Array[Double](n)
        var x = 0.0
        val step = 0.05 + 0.1 * rng.nextDouble()
        for (i <- 0 until n) { x += step * rng.nextGaussian(); out(i) = offset + scale * x }
        out
      case 1 => // trend + seasonality + noise
        val slope  = (rng.nextDouble() - 0.5) * 2.0 / n
        val period = 8 + rng.nextInt(math.max(8, n / 4))
        val amp    = 0.2 + 0.8 * rng.nextDouble()
        val phase  = rng.nextDouble() * 2 * math.Pi
        val noise  = 0.05 + 0.1 * rng.nextDouble()
        Array.tabulate(n) { i =>
          offset + scale * (slope * i + amp * math.sin(2 * math.Pi * i / period + phase) +
            noise * rng.nextGaussian())
        }
      case 2 => // AR(1), mean-reverting
        val rho = 0.7 + 0.29 * rng.nextDouble()
        val out = new Array[Double](n)
        var x = 0.0
        for (i <- 0 until n) { x = rho * x + 0.3 * rng.nextGaussian(); out(i) = offset + scale * x }
        out
      case 3 => // piecewise-constant regimes + noise
        val out = new Array[Double](n)
        var level = rng.nextGaussian()
        var next  = 0
        for (i <- 0 until n) {
          if (i == next) { level = rng.nextGaussian(); next = i + 8 + rng.nextInt(math.max(8, n / 6)) }
          out(i) = offset + scale * (level + 0.05 * rng.nextGaussian())
        }
        out
      case 4 => // baseline + occasional spikes
        Array.tabulate(n) { _ =>
          val spike = if (rng.nextDouble() < 0.04) 2.0 + 2.0 * rng.nextDouble() else 0.0
          offset + scale * (0.1 * rng.nextGaussian() + spike)
        }
      case _ => throw new IllegalArgumentException(s"unknown family $family")
    }

  /** Daily aggregates over TPC-H-lite lineitem: one row per ship date with
    * sum(quantity), avg(extendedprice) and the row count. Exposed so tests
    * can cross-check it against DuckDB via `repro.Oracle`.
    */
  def tpchDailyDF(spark: SparkSession, sf: Double): DataFrame =
    SynthData
      .lineitem(spark, sf)
      .groupBy(col("l_shipdate"))
      .agg(
        sum(col("l_quantity")).as("qty_sum"),
        avg(col("l_extendedprice")).as("price_avg"),
        count(lit(1)).cast("double").as("cnt")
      )
      .orderBy(col("l_shipdate"))

  /** Slice the TPC-H daily aggregate series into fixed-length segments —
    * the pool the `tpch` table family samples from.
    */
  def tpchPool(spark: SparkSession, sf: Double = 0.01, sliceLen: Int = 512): Array[Array[Double]] = {
    val rows = tpchDailyDF(spark, sf).collect()
    val seriesCols = Seq(1, 2, 3).map(i => rows.map(_.getDouble(i)))
    seriesCols.flatMap { s =>
      s.grouped(sliceLen).filter(_.length >= sliceLen / 2).map(_.toArray)
    }.toArray
  }

  /** Draw a series from the TPC-H pool, resampled to `n` and rescaled. */
  def fromPool(rng: Random, pool: Array[Array[Double]], n: Int, scale: Double, offset: Double): Array[Double] = {
    val base = pool(rng.nextInt(pool.length))
    val res  = repro.core.Features.resample(base, n)
    val z    = repro.core.Features.znorm(res)
    z.map(v => offset + scale * v)
  }
}
