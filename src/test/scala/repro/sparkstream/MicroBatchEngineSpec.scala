package repro.sparkstream

import repro.SparkSpec
import repro.bn.{ForwardSampler, TestNets}
import repro.core.{BNModel, EpsilonAllocation}
import repro.counter.{CounterLayout, ExactCounterBank}
import repro.stream.SequentialDriver

class MicroBatchEngineSpec extends SparkSpec {
  private val net = TestNets.chain
  private val layout = CounterLayout.standard(net)
  private val k = 4

  /** Allocation so tight that p stays 1 — the engine degenerates to exact. */
  private def exactish: EpsilonAllocation = EpsilonAllocation.Baseline(1e-6, net.n)

  test("exact-mode micro-batching reproduces exact counts and 2nm messages") {
    val m = 2000L
    val events = ForwardSampler.events(spark, net, m, k, seed = 1L)
    val engine = MicroBatchEngine(net, layout, exactish, k, seed = 2L)
    engine.run(spark, events, m, numBatches = 5)

    val ref = new ExactCounterBank(layout.numCounters)
    SequentialDriver.run(layout, ref, ForwardSampler.localEvents(net, m, k, seed = 1L))

    assert(engine.messages == 2L * net.n * m)
    assert(engine.eventsProcessed == m)
    (0 until layout.numCounters).foreach { c =>
      assert(engine.coordinator.estimate(c) == ref.count(c).toDouble, s"counter $c")
    }
  }

  test("state carries across batches: one batch equals many batches in exact mode") {
    val m = 1500L
    val events = ForwardSampler.events(spark, net, m, k, seed = 3L)
    val one = MicroBatchEngine(net, layout, exactish, k, seed = 4L)
    one.run(spark, events, m, numBatches = 1)
    val many = MicroBatchEngine(net, layout, exactish, k, seed = 4L)
    many.run(spark, events, m, numBatches = 7)
    (0 until layout.numCounters).foreach { c =>
      assert(one.coordinator.estimate(c) == many.coordinator.estimate(c), s"counter $c")
    }
  }

  test("approximate mode saves communication") {
    val m = 20000L
    val events = ForwardSampler.events(spark, net, m, k, seed = 5L)
    val engine = MicroBatchEngine(net, layout, EpsilonAllocation.Uniform(0.8, net.n), k, seed = 6L)
    engine.run(spark, events, m, numBatches = 10)
    assert(engine.messages < 2L * net.n * m / 2, s"messages=${engine.messages}")
  }

  test("approximate mode stays close to the exact MLE") {
    val m = 20000L
    val events = ForwardSampler.events(spark, net, m, k, seed = 7L)
    val engine = MicroBatchEngine(net, layout, EpsilonAllocation.Uniform(0.4, net.n), k, seed = 8L)
    engine.run(spark, events, m, numBatches = 10)

    val ref = new ExactCounterBank(layout.numCounters)
    SequentialDriver.run(layout, ref, ForwardSampler.localEvents(net, m, k, seed = 7L))
    val mle = new BNModel(net, layout, ref.estimate)

    val assignments = for (a <- 0 until 2; b <- 0 until 3; c <- 0 until 2)
      yield Array(a, b, c)
    val within = assignments.count { x =>
      val ratio = engine.model.jointProb(x) / mle.jointProb(x)
      ratio >= math.exp(-0.4) && ratio <= math.exp(0.4)
    }
    assert(within >= assignments.size * 3 / 4, s"$within/${assignments.size} within bounds")
  }

  test("per-batch message counts are reported and sum to the total") {
    val m = 3000L
    val events = ForwardSampler.events(spark, net, m, k, seed = 9L)
    val engine = MicroBatchEngine(net, layout, exactish, k, seed = 10L)
    val per = math.max(1L, m / 4)
    var acc = 0L
    var lo = 0L
    while (lo < m) {
      val hi = math.min(m, lo + per)
      acc += engine.processBatch(spark, events.filter(e => e.id >= lo && e.id < hi))
      lo = hi
    }
    assert(acc == engine.messages)
  }

  test("empty batches are harmless") {
    val events = ForwardSampler.events(spark, net, 10L, k, seed = 11L)
    val engine = MicroBatchEngine(net, layout, exactish, k, seed = 12L)
    val msgs = engine.processBatch(spark, events.filter(_.id > 100L))
    assert(msgs == 0L)
    assert(engine.eventsProcessed == 0L)
  }
}
