package repro

import org.apache.spark.sql.functions._

/** Exercises the provided TPC-H-lite generators and the DuckDB oracle on
  * plain Spark SQL aggregations — validates the oracle harness itself, which
  * every evaluation-SQL test in this repo depends on.
  */
class SynthDataOracleSpec extends SparkSpec {

  test("lineitem aggregation matches DuckDB") {
    val li = SynthData.lineitem(spark, sf = 0.001).cache()
    li.createOrReplaceTempView("lineitem")
    val agg = spark.sql(
      """SELECT l_returnflag,
        |       CAST(COUNT(*) AS BIGINT) AS cnt,
        |       CAST(SUM(CAST(l_quantity AS DOUBLE)) AS DOUBLE) AS sum_qty
        |FROM lineitem GROUP BY l_returnflag ORDER BY l_returnflag""".stripMargin)
    Oracle.assertEquivalent(agg,
      """SELECT l_returnflag,
        |       CAST(COUNT(*) AS BIGINT) AS cnt,
        |       CAST(SUM(CAST(l_quantity AS DOUBLE)) AS DOUBLE) AS sum_qty
        |FROM lineitem GROUP BY l_returnflag ORDER BY l_returnflag""".stripMargin,
      "lineitem" -> li)
  }

  test("orders join customer matches DuckDB") {
    val o = SynthData.orders(spark, sf = 0.001).cache()
    val c = SynthData.customer(spark, sf = 0.001).cache()
    o.createOrReplaceTempView("orders"); c.createOrReplaceTempView("customer")
    val sql =
      """SELECT c_mktsegment, CAST(COUNT(*) AS BIGINT) AS cnt
        |FROM orders JOIN customer ON CAST(o_custkey AS BIGINT) = CAST(c_custkey AS BIGINT)
        |GROUP BY c_mktsegment ORDER BY c_mktsegment""".stripMargin
    Oracle.assertEquivalent(spark.sql(sql), sql, "orders" -> o, "customer" -> c)
  }

  test("generators are deterministic in (sf, seed)") {
    val a = SynthData.lineitem(spark, sf = 0.0005, seed = 9).agg(sum("l_extendedprice")).first().getDouble(0)
    val b = SynthData.lineitem(spark, sf = 0.0005, seed = 9).agg(sum("l_extendedprice")).first().getDouble(0)
    assert(a == b)
  }

  test("zipf keys are skewed, uniform keys are not") {
    val zipf = SynthData.zipfKeys(spark, rows = 20000, nKeys = 1000)
    val uni = SynthData.uniformKeys(spark, rows = 20000, nKeys = 1000)
    def topShare(df: org.apache.spark.sql.DataFrame): Double = {
      val top = df.groupBy("k").count().orderBy(desc("count")).limit(10)
        .agg(sum("count")).first().getLong(0)
      top / 20000.0
    }
    assert(topShare(zipf) > 0.4, s"zipf top-10 share ${topShare(zipf)}")
    assert(topShare(uni) < 0.05, s"uniform top-10 share ${topShare(uni)}")
  }

  test("oracle rejects column-name mismatches") {
    import spark.implicits._
    val df = Seq((1, "a")).toDF("x", "y")
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(df, "SELECT 1 AS z", "t" -> df)
    }
  }

  test("oracle detects wrong results") {
    import spark.implicits._
    val df = Seq(Tuple1(1L)).toDF("cnt")
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(df, "SELECT CAST(2 AS BIGINT) AS cnt", "t" -> df)
    }
  }
}
