package repro

import org.apache.spark.sql.functions._

/** Smoke tests exercising the provided TPC-H-lite generators through the
  * DuckDB oracle — validates the Oracle plumbing itself on plain SQL
  * before it is trusted for the graph dataflow checks.
  */
class SynthDataOracleSpec extends SparkSpec {

  private lazy val li = SynthData.lineitem(spark, sf = 0.002).cache()

  test("lineitem row count scales with sf") {
    assert(li.count() == 12000L)
  }

  test("group-by aggregation matches DuckDB") {
    val sparkDf = li.groupBy("l_returnflag").agg(count(lit(1)).as("n"))
    Oracle.assertEquivalent(sparkDf,
      "SELECT l_returnflag, count(*) AS n FROM lineitem GROUP BY l_returnflag",
      "lineitem" -> li)
  }

  test("join + filter matches DuckDB") {
    val ord = SynthData.orders(spark, sf = 0.002).cache()
    val sparkDf = li.join(ord, li("l_orderkey") === ord("o_orderkey"))
      .where(col("o_orderstatus") === "O")
      .groupBy("l_linestatus").agg(count(lit(1)).as("n"))
    Oracle.assertEquivalent(sparkDf,
      """SELECT l_linestatus, count(*) AS n
        |FROM lineitem JOIN orders ON l_orderkey = o_orderkey
        |WHERE o_orderstatus = 'O' GROUP BY l_linestatus""".stripMargin,
      "lineitem" -> li, "orders" -> ord)
  }

  test("zipf keys are skewed, uniform keys are not") {
    val z = SynthData.zipfKeys(spark, 20000, 1000).groupBy("k").count()
      .agg(max("count").as("mx")).head().getLong(0)
    val u = SynthData.uniformKeys(spark, 20000, 1000).groupBy("k").count()
      .agg(max("count").as("mx")).head().getLong(0)
    assert(z > 3 * u, s"zipf max $z vs uniform max $u")
  }
}
