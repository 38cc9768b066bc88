package repro

import org.apache.spark.sql.functions._

/** Exercises the DuckDB oracle against the provided TPC-H-lite generators:
  * a wrong Spark aggregation or a broken oracle canonicalization would
  * surface here before it could mask a bug in the paper pipeline.
  */
class OracleSpec extends SparkSpec {

  private lazy val li = SynthData.lineitem(spark, sf = 0.0005, seed = 1L).cache()
  private lazy val ord = SynthData.orders(spark, sf = 0.0005, seed = 2L).cache()

  test("group-by aggregation matches DuckDB") {
    val sparkDf = li.groupBy("l_returnflag")
      .agg(count(lit(1)).as("cnt"), sum("l_quantity").as("qty"))
      .select("l_returnflag", "cnt", "qty")
    Oracle.assertEquivalent(sparkDf,
      """SELECT l_returnflag, count(*) AS cnt, sum(CAST(l_quantity AS DOUBLE)) AS qty
        |FROM lineitem GROUP BY l_returnflag""".stripMargin,
      "lineitem" -> li)
  }

  test("filtered count matches DuckDB") {
    val sparkDf = li.filter(col("l_discount") > 0.05)
      .agg(count(lit(1)).as("cnt"))
    Oracle.assertEquivalent(sparkDf,
      "SELECT count(*) AS cnt FROM lineitem WHERE CAST(l_discount AS DOUBLE) > 0.05",
      "lineitem" -> li)
  }

  test("join aggregation matches DuckDB") {
    val sparkDf = li.join(ord, li("l_orderkey") === ord("o_orderkey"))
      .groupBy("o_orderstatus")
      .agg(count(lit(1)).as("cnt"))
      .select("o_orderstatus", "cnt")
    Oracle.assertEquivalent(sparkDf,
      """SELECT o_orderstatus, count(*) AS cnt
        |FROM lineitem JOIN orders ON l_orderkey = o_orderkey
        |GROUP BY o_orderstatus""".stripMargin,
      "lineitem" -> li, "orders" -> ord)
  }

  test("oracle rejects a wrong result") {
    val wrong = li.agg((count(lit(1)) + 1).as("cnt"))
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(wrong, "SELECT count(*) AS cnt FROM lineitem", "lineitem" -> li)
    }
  }

  test("oracle rejects mismatched column sets") {
    val sparkDf = li.agg(count(lit(1)).as("wrong_name"))
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(sparkDf, "SELECT count(*) AS cnt FROM lineitem", "lineitem" -> li)
    }
  }

  test("zipf keys are skewed, uniform keys are not") {
    val z = SynthData.zipfKeys(spark, rows = 20000, nKeys = 1000, seed = 3L)
    val u = SynthData.uniformKeys(spark, rows = 20000, nKeys = 1000, seed = 4L)
    val zTop = z.groupBy("k").count().orderBy(desc("count")).first().getLong(1)
    val uTop = u.groupBy("k").count().orderBy(desc("count")).first().getLong(1)
    assert(zTop > 5 * uTop, s"zipf top $zTop vs uniform top $uTop")
  }
}
