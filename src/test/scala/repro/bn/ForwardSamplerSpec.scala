package repro.bn

import repro.SparkSpec

class ForwardSamplerSpec extends SparkSpec {
  private val net = TestNets.chain

  test("generates exactly m events with distinct ids 0..m-1") {
    val ds = ForwardSampler.events(spark, net, m = 1000, k = 5, seed = 1L)
    val rows = ds.collect()
    assert(rows.length == 1000)
    assert(rows.map(_.id).sorted.toSeq == (0L until 1000L))
  }

  test("sites are within [0, k)") {
    val rows = ForwardSampler.events(spark, net, 2000, k = 7, seed = 2L).collect()
    assert(rows.forall(e => e.site >= 0 && e.site < 7))
  }

  test("site assignment is roughly uniform") {
    val rows = ForwardSampler.events(spark, net, 7000, k = 7, seed = 3L).collect()
    val counts = rows.groupBy(_.site).view.mapValues(_.size)
    counts.values.foreach(c => assert(math.abs(c - 1000) < 200, s"site load $c"))
  }

  test("Spark generation matches driver-side generation exactly") {
    val fromSpark = ForwardSampler.events(spark, net, 500, 4, seed = 4L)
      .collect().sortBy(_.id).map(e => (e.id, e.site, e.x.toSeq)).toSeq
    val local = ForwardSampler.localEvents(net, 500, 4, seed = 4L)
      .map(e => (e.id, e.site, e.x.toSeq)).toSeq
    assert(fromSpark == local)
  }

  test("sampled values respect the domains") {
    val rows = ForwardSampler.events(spark, TestNets.random20, 300, 3, 5L).collect()
    rows.foreach(e =>
      e.x.zipWithIndex.foreach { case (v, i) =>
        assert(v >= 0 && v < TestNets.random20.card(i))
      })
  }

  test("empirical joint distribution matches the network (chi-square-ish)") {
    val m = 30000
    val rows = ForwardSampler.events(spark, net, m, 4, seed = 6L).collect()
    val freq = rows.groupBy(_.x.toSeq).view.mapValues(_.size.toDouble / m).toMap
    for (a <- 0 until 2; b <- 0 until 3; c <- 0 until 2) {
      val p = net.jointProb(Array(a, b, c))
      val f = freq.getOrElse(Seq(a, b, c), 0.0)
      assert(math.abs(f - p) < 0.015, s"P($a,$b,$c): emp=$f true=$p")
    }
  }

  test("different seeds give different streams") {
    val a = ForwardSampler.localEvents(net, 100, 4, 10L).map(_.x.toSeq).toSeq
    val b = ForwardSampler.localEvents(net, 100, 4, 11L).map(_.x.toSeq).toSeq
    assert(a != b)
  }
}
