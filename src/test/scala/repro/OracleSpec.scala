package repro

import org.apache.spark.sql.functions._

/** The DuckDB oracle itself: accepts equivalent results, rejects wrong
  * ones — so a green oracle check in other suites means something.
  */
class OracleSpec extends SparkSpec {

  private lazy val li = SynthData.lineitem(spark, sf = 0.001).cache()

  test("accepts an identical aggregation") {
    val got = li.groupBy("l_returnflag")
      .agg(count(lit(1)).cast("double").as("n"), sum("l_quantity").as("q"))
    Oracle.assertEquivalent(got,
      """SELECT l_returnflag,
        |       CAST(COUNT(*) AS DOUBLE) AS n,
        |       SUM(CAST(l_quantity AS DOUBLE)) AS q
        |FROM lineitem GROUP BY l_returnflag""".stripMargin,
      "lineitem" -> li)
  }

  test("rejects a wrong aggregate") {
    val wrong = li.groupBy("l_returnflag")
      .agg((count(lit(1)) + 1).cast("double").as("n"))
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(wrong,
        "SELECT l_returnflag, CAST(COUNT(*) AS DOUBLE) AS n FROM lineitem GROUP BY l_returnflag",
        "lineitem" -> li)
    }
  }

  test("rejects mismatched column sets") {
    val got = li.select(col("l_orderkey").as("wrong_name")).limit(1)
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(got, "SELECT l_orderkey FROM lineitem LIMIT 1",
        "lineitem" -> li)
    }
  }

  test("handles nulls consistently on both sides") {
    import spark.implicits._
    val df = Seq(("a", Some(1.0)), ("b", None)).toDF("k", "v")
    Oracle.assertEquivalent(df,
      "SELECT k, CAST(v AS DOUBLE) AS v FROM t", "t" -> df)
  }

  test("joins validate across engines (synthetic TPC-H-lite)") {
    val ord = SynthData.orders(spark, sf = 0.001).cache()
    val got = li.join(ord, li("l_orderkey") === ord("o_orderkey"))
      .groupBy("o_orderstatus")
      .agg(count(lit(1)).cast("double").as("n"))
    Oracle.assertEquivalent(got,
      """SELECT o_orderstatus, CAST(COUNT(*) AS DOUBLE) AS n
        |FROM lineitem JOIN orders ON CAST(l_orderkey AS BIGINT) = CAST(o_orderkey AS BIGINT)
        |GROUP BY o_orderstatus""".stripMargin,
      "lineitem" -> li, "orders" -> ord)
  }
}
