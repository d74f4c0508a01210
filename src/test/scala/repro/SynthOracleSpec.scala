package repro

import org.apache.spark.sql.functions._

/** Keeps the provided TPC-H-lite generators and the DuckDB oracle wired and
  * honest: the uncertain-graph experiments represent their edge tables as
  * DataFrames, and these tests pin the oracle's behaviour on the kinds of
  * aggregation the pipeline relies on.
  */
class SynthOracleSpec extends SparkSpec {

  test("oracle validates a grouped aggregate on lineitem") {
    val li = SynthData.lineitem(spark, sf = 0.001)
      .select("l_returnflag", "l_quantity", "l_orderkey").cache()
    val agg = li.groupBy("l_returnflag")
      .agg(count(lit(1)).as("cnt"), round(sum("l_quantity"), 4).as("qty"))
    Oracle.assertEquivalent(
      agg,
      "SELECT l_returnflag, COUNT(*) AS cnt, " +
        "ROUND(SUM(CAST(l_quantity AS DOUBLE)), 4) AS qty " +
        "FROM lineitem GROUP BY l_returnflag",
      "lineitem" -> li,
    )
  }

  test("oracle validates a join between orders and customer") {
    val o = SynthData.orders(spark, sf = 0.001).select("o_orderkey", "o_custkey").cache()
    val c = SynthData.customer(spark, sf = 0.001).select("c_custkey", "c_mktsegment").cache()
    val joined = o.join(c, o("o_custkey") === c("c_custkey"))
      .groupBy("c_mktsegment").agg(count(lit(1)).as("cnt"))
    Oracle.assertEquivalent(
      joined,
      "SELECT c_mktsegment, COUNT(*) AS cnt FROM orders o " +
        "JOIN customer c ON CAST(o.o_custkey AS BIGINT) = CAST(c.c_custkey AS BIGINT) " +
        "GROUP BY c_mktsegment",
      "orders" -> o, "customer" -> c,
    )
  }

  test("oracle validates an uncertain-graph edge aggregation") {
    val ug = repro.data.Datasets.karate()
    val df = ug.toDF(spark).cache()
    val agg = df.groupBy("src").agg(count(lit(1)).as("deg"), round(sum("p"), 6).as("psum"))
    Oracle.assertEquivalent(
      agg,
      "SELECT src, COUNT(*) AS deg, ROUND(SUM(CAST(p AS DOUBLE)), 6) AS psum " +
        "FROM edges GROUP BY src",
      "edges" -> df,
    )
  }

  test("zipf keys are skewed, uniform keys are not") {
    val z = SynthData.zipfKeys(spark, 20000, 100)
    val u = SynthData.uniformKeys(spark, 20000, 100)
    val topZ = z.groupBy("k").count().orderBy(desc("count")).first().getLong(1)
    val topU = u.groupBy("k").count().orderBy(desc("count")).first().getLong(1)
    assert(topZ > topU * 3, s"zipf top $topZ vs uniform top $topU")
  }
}
