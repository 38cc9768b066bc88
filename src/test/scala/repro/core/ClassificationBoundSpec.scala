package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.bn.{ForwardSampler, TestNets}
import repro.counter.{CounterLayout, DistCounterBank, ExactCounterBank}
import repro.stream.SequentialDriver

/** Section 5.3: approximate Bayesian classification.
  *
  * Lemma 12: an e^{±ε/2} joint approximation yields e^{±ε} conditionals.
  * Lemma 13 / Definition 4: classifying with the approximate model picks
  * an assignment whose exact-MLE posterior is ≥ e^{-ε} of the best.
  */
class ClassificationBoundSpec extends AnyFunSuite {
  private val net = TestNets.chain
  private val layout = CounterLayout.standard(net)
  private val k = 5
  private val m = 30000

  private def mleModel(seed: Long): BNModel = {
    val bank = new ExactCounterBank(layout.numCounters)
    SequentialDriver.run(layout, bank, ForwardSampler.localEvents(net, m, k, seed))
    new BNModel(net, layout, bank.estimate)
  }

  private def approxModel(eps: Double, dataSeed: Long, protoSeed: Long): BNModel = {
    val alloc = EpsilonAllocation.NonUniform(eps, net)
    val bank = DistCounterBank(layout.numCounters, k, alloc.epsArray(layout), protoSeed)
    SequentialDriver.run(layout, bank,
      ForwardSampler.localEvents(net, m, k, dataSeed)).last.model(net, layout)
  }

  /** Exact posterior of `target` given the rest, under a model. */
  private def posterior(model: BNModel, x: Array[Int], target: Int): Array[Double] = {
    val scores = Array.tabulate(net.card(target)) { v =>
      val w = x.clone(); w(target) = v
      model.jointProb(w)
    }
    val z = scores.sum
    if (z == 0) scores else scores.map(_ / z)
  }

  test("Lemma 12: joint e^{±eps/2} bound transfers to conditionals at e^{±eps}") {
    val eps = 0.4
    val mle = mleModel(61L)
    val approx = approxModel(eps / 2, 61L, 62L)
    var checked = 0
    var ok = 0
    for (t <- 0 until 50; target <- 0 until net.n) {
      val x = net.sample(63L, t.toLong)
      val pA = posterior(approx, x, target)
      val pM = posterior(mle, x, target)
      for (v <- 0 until net.card(target) if pM(v) > 1e-9) {
        checked += 1
        val ratio = pA(v) / pM(v)
        if (ratio >= math.exp(-eps) * 0.95 && ratio <= math.exp(eps) * 1.05) ok += 1
      }
    }
    assert(ok.toDouble / checked > 0.85, s"$ok/$checked conditionals within e^±$eps")
  }

  test("Lemma 13: the approximate classifier's pick is near-optimal under the MLE") {
    val eps = 0.4
    val mle = mleModel(64L)
    val approx = approxModel(eps / 4, 64L, 65L)
    var ok = 0
    val trials = 300
    for (t <- 0 until trials) {
      val x = net.sample(66L, t.toLong)
      val target = t % net.n
      val pick = approx.predict(x, target)
      val pM = posterior(mle, x, target)
      if (pM(pick) >= math.exp(-eps) * pM.max * 0.95) ok += 1
    }
    assert(ok.toDouble / trials > 0.9, s"$ok/$trials picks were e^-eps-optimal")
  }

  test("approximate and exact classifiers agree on nearly all tests") {
    val mle = mleModel(67L)
    val approx = approxModel(0.1, 67L, 68L)
    val agree = (0 until 500).count { t =>
      val x = net.sample(69L, t.toLong)
      approx.predict(x, t % net.n) == mle.predict(x, t % net.n)
    }
    assert(agree >= 480, s"agreement $agree/500")
  }
}
