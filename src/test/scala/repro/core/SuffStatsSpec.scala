package repro.core

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}
import repro.bn.{ForwardSampler, TestNets}
import repro.counter.{CounterLayout, ExactCounterBank}
import repro.stream.SequentialDriver

class SuffStatsSpec extends SparkSpec {
  import spark.implicits._

  private val net = TestNets.chain
  private val layout = CounterLayout.standard(net)

  test("familyRows yields n rows per event with in-range values") {
    val events = ForwardSampler.events(spark, net, 200, 3, seed = 1L)
    val rows = SuffStats.familyRows(spark, net, events).collect()
    assert(rows.length == 600)
    rows.foreach { r =>
      assert(r.i >= 0 && r.i < 3)
      assert(r.v >= 0 && r.v < net.card(r.i))
      assert(r.u >= 0 && r.u < net.parentCard(r.i))
    }
  }

  test("familyCounts matches DuckDB on the chain network (oracle check)") {
    val events = ForwardSampler.events(spark, net, 500, 3, seed = 2L)
    // Widen x into columns so plain SQL can compute the family grouping.
    val wide = events.map(e => (e.x(0), e.x(1), e.x(2))).toDF("x0", "x1", "x2")
    val sparkDf = SuffStats.familyCounts(spark, net, events)
      .select($"i", $"v", $"u", $"cnt")
    // chain parent codes: node 0 → 0, node 1 → x0, node 2 → x1
    val sql =
      """SELECT 0 AS i, x0 AS v, 0 AS u, count(*) AS cnt FROM events GROUP BY x0
        |UNION ALL
        |SELECT 1, x1, x0, count(*) FROM events GROUP BY x1, x0
        |UNION ALL
        |SELECT 2, x2, x1, count(*) FROM events GROUP BY x2, x1""".stripMargin
    Oracle.assertEquivalent(sparkDf, sql, "events" -> wide)
  }

  test("familyCounts matches DuckDB on the collider network (oracle check)") {
    val col = TestNets.collider
    val events = ForwardSampler.events(spark, col, 400, 3, seed = 3L)
    val wide = events.map(e => (e.x(0), e.x(1), e.x(2))).toDF("x0", "x1", "x2")
    val sparkDf = SuffStats.familyCounts(spark, col, events).select($"i", $"v", $"u", $"cnt")
    // collider parent code of node 2 = x0*2 + x1
    val sql =
      """SELECT 0 AS i, x0 AS v, 0 AS u, count(*) AS cnt FROM events GROUP BY x0
        |UNION ALL
        |SELECT 1, x1, 0, count(*) FROM events GROUP BY x1
        |UNION ALL
        |SELECT 2, x2, CAST(x0 AS INT)*2 + CAST(x1 AS INT), count(*)
        |  FROM events GROUP BY x2, CAST(x0 AS INT)*2 + CAST(x1 AS INT)""".stripMargin
    Oracle.assertEquivalent(sparkDf, sql, "events" -> wide)
  }

  test("familyCounts agrees with the sequential exact counter bank") {
    val m = 2000
    val events = ForwardSampler.events(spark, net, m, 4, seed = 4L)
    val counts = SuffStats.familyCounts(spark, net, events).collect()
      .map(r => (r.getInt(0), r.getInt(1), r.getInt(2)) -> r.getLong(3)).toMap
    val bank = new ExactCounterBank(layout.numCounters)
    SequentialDriver.run(layout, bank, ForwardSampler.localEvents(net, m, 4, seed = 4L))
    for (i <- 0 until net.n; u <- 0 until net.parentCard(i); v <- 0 until net.card(i)) {
      val expected = counts.getOrElse((i, v, u), 0L)
      assert(bank.count(layout.childCounter(i, v, u)) == expected, s"counter($i,$v,$u)")
    }
  }

  test("toEstimates sets parent counters to the sum over child values") {
    val m = 1500
    val events = ForwardSampler.events(spark, net, m, 4, seed = 5L)
    val rows = SuffStats.familyCounts(spark, net, events).collect()
      .map(r => (r.getInt(0), r.getInt(1), r.getInt(2), r.getLong(3)))
    val est = SuffStats.toEstimates(layout, rows)
    for (i <- 0 until net.n; u <- 0 until net.parentCard(i)) {
      val childSum = (0 until net.card(i)).map(v => est(layout.childCounter(i, v, u))).sum
      assert(est(layout.parentCounter(i, u)) == childSum, s"parent($i,$u)")
    }
    // every event contributes once per root family: parent counter of node 0 is m
    assert(est(layout.parentCounter(0, 0)) == m.toDouble)
  }

  test("toEstimates on the naive-bayes shared layout does not double count") {
    val nb = repro.bn.NetworkGenerator.naiveBayes("nb", 4, 3, Array(2, 4, 2), seed = 6L)
    val nbLayout = CounterLayout.naiveBayes(nb)
    val m = 1200
    val events = ForwardSampler.events(spark, nb, m, 4, seed = 7L)
    val rows = SuffStats.familyCounts(spark, nb, events).collect()
      .map(r => (r.getInt(0), r.getInt(1), r.getInt(2), r.getLong(3)))
    val est = SuffStats.toEstimates(nbLayout, rows)
    // shared block totals the events, once
    val sharedSum = (0 until nb.card(0)).map(v => est(nbLayout.childCounter(0, v, 0))).sum
    assert(sharedSum == m.toDouble, s"shared block sums to $sharedSum, expected $m")
    assert(est(nbLayout.parentCounter(0, 0)) == m.toDouble)
  }

  test("exactModel reproduces empirical conditionals") {
    val m = 20000
    val events = ForwardSampler.events(spark, net, m, 4, seed = 8L)
    val model = SuffStats.exactModel(spark, net, layout, events)
    for (i <- 0 until net.n; u <- 0 until net.parentCard(i); v <- 0 until net.card(i)) {
      assert(math.abs(model.theta(i, v, u) - net.truth(i, v, u)) < 0.04,
        s"theta($i,$v,$u)")
    }
  }

  test("exactModel equals the sequential exact model parameter-for-parameter") {
    val m = 3000
    val events = ForwardSampler.events(spark, net, m, 4, seed = 9L)
    val sparkModel = SuffStats.exactModel(spark, net, layout, events)
    val bank = new ExactCounterBank(layout.numCounters)
    SequentialDriver.run(layout, bank, ForwardSampler.localEvents(net, m, 4, seed = 9L))
    val seqModel = new BNModel(net, layout, bank.estimate)
    for (i <- 0 until net.n; u <- 0 until net.parentCard(i); v <- 0 until net.card(i))
      assert(sparkModel.theta(i, v, u) == seqModel.theta(i, v, u), s"theta($i,$v,$u)")
  }
}
