package repro

import org.apache.spark.sql.functions._

/** Sanity checks pinning the provided TPC-H-lite generators and DataFrame
  * aggregation semantics to the DuckDB oracle (exercised at tiny SF).
  */
class OracleSynthSpec extends SparkSpec {

  private val sf = 0.0005

  test("lineitem row counts per returnflag match DuckDB") {
    val li = SynthData.lineitem(spark, sf).cache()
    val agg = li.groupBy("l_returnflag").agg(count(lit(1)).as("cnt"))
    Oracle.assertEquivalent(
      agg,
      "SELECT l_returnflag, COUNT(*) AS cnt FROM lineitem GROUP BY l_returnflag",
      "lineitem" -> li)
  }

  test("integer quantity sums per linestatus match DuckDB") {
    val li = SynthData.lineitem(spark, sf).cache()
    val agg = li.groupBy("l_linestatus")
      .agg(sum(col("l_quantity").cast("long")).as("qty"))
    Oracle.assertEquivalent(
      agg,
      """SELECT l_linestatus,
        |       CAST(SUM(CAST(TRUNC(CAST(l_quantity AS DOUBLE)) AS BIGINT)) AS BIGINT) AS qty
        |FROM lineitem GROUP BY l_linestatus""".stripMargin,
      "lineitem" -> li)
  }

  test("orders–customer join counts per mktsegment match DuckDB") {
    val o = SynthData.orders(spark, sf).cache()
    val c = SynthData.customer(spark, sf).cache()
    val agg = o.join(c, o("o_custkey") === c("c_custkey"))
      .groupBy("c_mktsegment").agg(count(lit(1)).as("cnt"))
    Oracle.assertEquivalent(
      agg,
      """SELECT c_mktsegment, COUNT(*) AS cnt
        |FROM orders JOIN customer ON CAST(o_custkey AS BIGINT) = CAST(c_custkey AS BIGINT)
        |GROUP BY c_mktsegment""".stripMargin,
      "orders" -> o, "customer" -> c)
  }

  test("zipf keys are skewed: top key dominates the uniform top key") {
    val z = SynthData.zipfKeys(spark, 5000, 100).groupBy("k").count()
    val u = SynthData.uniformKeys(spark, 5000, 100).groupBy("k").count()
    val zTop = z.orderBy(col("count").desc).first().getLong(1)
    val uTop = u.orderBy(col("count").desc).first().getLong(1)
    assert(zTop > 2 * uTop)
  }
}
