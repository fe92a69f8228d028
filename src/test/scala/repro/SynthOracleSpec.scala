package repro

import org.apache.spark.sql.functions._

/** Plumbing checks for the provided TPC-H-lite generators and the DuckDB
  * oracle itself (kept per workspace rules; the paper's data substrate is
  * the graph generators, see DESIGN.md).
  */
class SynthOracleSpec extends SparkSpec {

  test("oracle: lineitem revenue aggregate matches DuckDB") {
    val li = SynthData.lineitem(spark, sf = 0.001)
      .select("l_returnflag", "l_extendedprice", "l_discount").cache()
    import spark.implicits._
    val sparkDf = li.groupBy($"l_returnflag")
      .agg(count(lit(1)) as "cnt",
           round(sum($"l_extendedprice" * (lit(1) - $"l_discount")), 2) as "revenue")
      .select($"l_returnflag", $"cnt", $"revenue")
    Oracle.assertEquivalent(sparkDf,
      """SELECT l_returnflag, COUNT(*) AS cnt,
        |       ROUND(SUM(CAST(l_extendedprice AS DOUBLE) * (1 - CAST(l_discount AS DOUBLE))), 2) AS revenue
        |FROM lineitem GROUP BY l_returnflag""".stripMargin,
      "lineitem" -> li)
  }

  test("oracle: orders join customer count matches DuckDB") {
    val o = SynthData.orders(spark, sf = 0.001).select("o_orderkey", "o_custkey").cache()
    val c = SynthData.customer(spark, sf = 0.001).select("c_custkey", "c_mktsegment").cache()
    import spark.implicits._
    val sparkDf = o.join(c, $"o_custkey" === $"c_custkey")
      .groupBy($"c_mktsegment").agg(count(lit(1)) as "cnt")
    Oracle.assertEquivalent(sparkDf,
      """SELECT c_mktsegment, COUNT(*) AS cnt
        |FROM orders JOIN customer ON CAST(o_custkey AS BIGINT) = CAST(c_custkey AS BIGINT)
        |GROUP BY c_mktsegment""".stripMargin,
      "orders" -> o, "customer" -> c)
  }

  test("oracle catches a wrong result") {
    import spark.implicits._
    val df = Seq((1, "a"), (2, "b")).toDF("k", "v").cache()
    val wrong = Seq((1L)).toDF("cnt").select($"cnt")
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(wrong, "SELECT COUNT(*) AS cnt FROM t", "t" -> df)
    }
  }

  test("zipf keys are skewed; uniform keys are not") {
    val z = SynthData.zipfKeys(spark, rows = 20000, nKeys = 1000)
    val u = SynthData.uniformKeys(spark, rows = 20000, nKeys = 1000)
    val topZ = z.groupBy("k").count().orderBy(desc("count")).first().getLong(1)
    val topU = u.groupBy("k").count().orderBy(desc("count")).first().getLong(1)
    assert(topZ > 3 * topU, s"zipf top=$topZ uniform top=$topU")
  }
}
