package repro

import org.apache.spark.sql.functions._

/** Sanity checks of the DuckDB oracle against Spark SQL over the provided
  * TPC-H-lite generators — catches canonicalisation drift early.
  */
class OracleSmokeSpec extends SparkSpec {

  test("customer counts by market segment match DuckDB") {
    val customer = SynthData.customer(spark, 0.002)
    val df = customer
      .groupBy(col("c_mktsegment"))
      .agg(count(lit(1)).cast("long").as("n"))
    Oracle.assertEquivalent(
      df,
      "SELECT c_mktsegment, COUNT(*) AS n FROM customer GROUP BY c_mktsegment",
      "customer" -> customer
    )
  }

  test("order price extremes by status match DuckDB") {
    val orders = SynthData.orders(spark, 0.002)
    val df = orders
      .groupBy(col("o_orderstatus"))
      .agg(min(col("o_totalprice")).as("lo"), max(col("o_totalprice")).as("hi"))
    Oracle.assertEquivalent(
      df,
      """SELECT o_orderstatus, MIN(CAST(o_totalprice AS DOUBLE)) AS lo,
        |       MAX(CAST(o_totalprice AS DOUBLE)) AS hi
        |FROM orders GROUP BY o_orderstatus""".stripMargin,
      "orders" -> orders
    )
  }

  test("filtered join cardinality matches DuckDB") {
    val orders   = SynthData.orders(spark, 0.002)
    val customer = SynthData.customer(spark, 0.002)
    val df = orders
      .join(customer, orders("o_custkey") === customer("c_custkey"))
      .where(col("c_mktsegment") === "BUILDING")
      .agg(count(lit(1)).cast("long").as("n"))
    Oracle.assertEquivalent(
      df,
      """SELECT COUNT(*) AS n
        |FROM orders o JOIN customer c ON CAST(o.o_custkey AS BIGINT) = CAST(c.c_custkey AS BIGINT)
        |WHERE c.c_mktsegment = 'BUILDING'""".stripMargin,
      "orders" -> orders, "customer" -> customer
    )
  }
}
