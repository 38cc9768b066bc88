package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.bn.{ForwardSampler, NetworkGenerator}
import repro.counter.{CounterLayout, DistCounterBank, ExactCounterBank}
import repro.eval.{Metrics, TestQueries}
import repro.stream.SequentialDriver

/** End-to-end checks of the Naïve-Bayes specialization (Section 5.2,
  * Algorithm 4): the shared-parent layout with the Equation-9 allocation
  * must match the accuracy of the generic scheme while maintaining fewer
  * counters and sending fewer messages.
  */
class NaiveBayesSpec extends AnyFunSuite {
  private val net = NetworkGenerator.naiveBayes("nbtest", 9, classCard = 4,
    featureCards = Array(2, 3, 2, 4, 2, 3, 2, 3), seed = 41L)
  private val std = CounterLayout.standard(net)
  private val nb = CounterLayout.naiveBayes(net)
  private val k = 5
  private val m = 30000

  test("shared layout maintains fewer counters than the standard layout") {
    assert(nb.numCounters < std.numCounters)
    // standard keeps (n−1) private parent blocks of size J₀ that sharing folds
    // into the root's child block: the saving is exactly (n−1)·J₀ counters.
    assert(std.numCounters - nb.numCounters == (net.n - 1) * net.card(0))
  }

  test("exact run over the shared layout: shared block holds class counts") {
    val bank = new ExactCounterBank(nb.numCounters)
    SequentialDriver.run(nb, bank, ForwardSampler.localEvents(net, m, k, 42L))
    val classCounts = (0 until net.card(0)).map(v => bank.count(nb.childCounter(0, v, 0)))
    assert(classCounts.sum == m.toLong)
    assert(bank.count(nb.parentCounter(0, 0)) == m.toLong)
  }

  test("exact models from shared and standard layouts agree on all parameters") {
    val bankStd = new ExactCounterBank(std.numCounters)
    SequentialDriver.run(std, bankStd, ForwardSampler.localEvents(net, m, k, 43L))
    val bankNb = new ExactCounterBank(nb.numCounters)
    SequentialDriver.run(nb, bankNb, ForwardSampler.localEvents(net, m, k, 43L))
    val mStd = new BNModel(net, std, bankStd.estimate)
    val mNb = new BNModel(net, nb, bankNb.estimate)
    for (i <- 0 until net.n; u <- 0 until net.parentCard(i); v <- 0 until net.card(i))
      assert(mStd.theta(i, v, u) == mNb.theta(i, v, u), s"theta($i,$v,$u)")
  }

  test("Algorithm 4 with the Equation-9 allocation stays accurate") {
    val alloc = EpsilonAllocation.NaiveBayes(0.4, net.card)
    val bank = DistCounterBank(nb.numCounters, k, alloc.epsArray(nb), 44L)
    val model = SequentialDriver.run(nb, bank,
      ForwardSampler.localEvents(net, m, k, 45L)).last.model(net, nb)
    val qs = TestQueries.condQueries(net, 300, 0.01, 46L)
    val err = Metrics.relErrVsTruth(model, qs)
    assert(err < 0.25, s"relErrVsTruth=$err")
  }

  test("Algorithm 4 saves communication over exact counting") {
    val alloc = EpsilonAllocation.NaiveBayes(0.8, net.card)
    val bank = DistCounterBank(nb.numCounters, k, alloc.epsArray(nb), 47L)
    val snap = SequentialDriver.run(nb, bank, ForwardSampler.localEvents(net, m, k, 48L)).last
    val exactMsgs = nb.updatesPerEvent.toLong * m
    assert(snap.messages < exactMsgs, s"${snap.messages} vs exact $exactMsgs")
  }

  test("shared layout sends no more messages than the standard layout at equal eps") {
    def msgs(layout: CounterLayout, alloc: EpsilonAllocation): Long = {
      val bank = DistCounterBank(layout.numCounters, k, alloc.epsArray(layout), 49L)
      SequentialDriver.run(layout, bank, ForwardSampler.localEvents(net, m, k, 50L)).last.messages
    }
    val shared = msgs(nb, EpsilonAllocation.NaiveBayes(0.4, net.card))
    val generic = msgs(std, EpsilonAllocation.NonUniform(0.4, net))
    assert(shared <= generic * 11 / 10, s"shared=$shared generic=$generic")
  }

  test("classification with the shared layout works") {
    val alloc = EpsilonAllocation.NaiveBayes(0.4, net.card)
    val bank = DistCounterBank(nb.numCounters, k, alloc.epsArray(nb), 51L)
    val model = SequentialDriver.run(nb, bank,
      ForwardSampler.localEvents(net, m, k, 52L)).last.model(net, nb)
    val exact = new ExactCounterBank(nb.numCounters)
    SequentialDriver.run(nb, exact, ForwardSampler.localEvents(net, m, k, 52L))
    val exactModel = new BNModel(net, nb, exact.estimate)
    val ts = TestQueries.clsTests(net, 500, 53L)
    val errApprox = Metrics.classificationError(model, ts)
    val errExact = Metrics.classificationError(exactModel, ts)
    assert(errApprox <= errExact + 0.1, s"approx=$errApprox exact=$errExact")
  }
}
