package repro.counter

import org.scalatest.funsuite.AnyFunSuite
import repro.util.Rng

class ExactCounterBankSpec extends AnyFunSuite {

  test("counts increments per counter") {
    val bank = new ExactCounterBank(3)
    bank.increment(0, 0); bank.increment(1, 0); bank.increment(2, 2)
    assert(bank.count(0) == 2L)
    assert(bank.count(1) == 0L)
    assert(bank.count(2) == 1L)
    assert(bank.estimate(0) == 2.0)
  }

  test("one message per increment (Lemma 5 accounting)") {
    val bank = new ExactCounterBank(5)
    (0 until 123).foreach(t => bank.increment(t % 4, t % 5))
    assert(bank.messages == 123L)
  }
}

class CoordinatorSpec extends AnyFunSuite {

  private def coord(c: Int = 2, k: Int = 3, eps: Double = 0.5, pScale: Double = math.sqrt(6.0)) =
    new Coordinator(c, k, Array.fill(c)(eps), pScale)

  test("estimate starts at zero and messages at zero") {
    val co = coord()
    assert(co.estimate(0) == 0.0)
    assert(co.messages == 0L)
  }

  test("receive with p=1 yields the exact per-site count") {
    val co = coord()
    co.receive(0, 0, 5, 1.0)
    assert(co.estimate(0) == 5.0)
    co.receive(1, 0, 3, 1.0)
    assert(co.estimate(0) == 8.0)
    assert(co.messages == 2L)
  }

  test("receive replaces a site's previous contribution, not adds to it") {
    val co = coord()
    co.receive(0, 0, 5, 1.0)
    co.receive(0, 0, 9, 1.0)
    assert(co.estimate(0) == 9.0)
  }

  test("receive with p<1 adds the expected unreported tail 1/p − 1") {
    val co = coord()
    co.receive(0, 0, 10, 4.0) // p = 1/4 → tail 3
    assert(math.abs(co.estimate(0) - 13.0) < 1e-12)
  }

  test("counters are independent") {
    val co = coord()
    co.receive(0, 0, 7, 1.0)
    assert(co.estimate(1) == 0.0)
  }

  test("pFor is 1 below threshold and decays like 1/estimate above") {
    val co = coord(eps = 0.5, pScale = 2.0)
    assert(co.pFor(0) == 1.0) // est 0 → p = min(1, 2/(0.5*1)) = 1
    co.receive(0, 0, 100, 1.0)
    // p = 2 / (0.5 * 100) = 0.04
    assert(math.abs(co.pFor(0) - 0.04) < 1e-12)
  }

  test("rejects non-positive error parameters") {
    intercept[IllegalArgumentException](new Coordinator(1, 2, Array(0.0), 1.0))
  }

  test("theoryScale is sqrt(2k)") {
    assert(math.abs(Coordinator.theoryScale(8) - 4.0) < 1e-12)
  }
}

class DistCounterBankSpec extends AnyFunSuite {

  /** Drive one counter with `total` increments spread over `k` sites. */
  private def drive(bank: DistCounterBank, k: Int, total: Int, seed: Long): Unit =
    (0 until total).foreach(t => bank.increment(Rng.uniformInt(k, seed, t.toLong), 0))

  test("exact below the reporting threshold: estimate equals the true count") {
    // eps small enough that p stays 1 for counts up to 1000
    val k = 4
    val bank = DistCounterBank(1, k, Array(0.001), seed = 1L)
    drive(bank, k, 1000, 11L)
    assert(bank.estimate(0) == 1000.0)
    assert(bank.messages == 1000L)
  }

  test("local counts partition the total") {
    val k = 4
    val bank = DistCounterBank(1, k, Array(0.001), seed = 2L)
    drive(bank, k, 500, 12L)
    assert((0 until k).map(bank.localCount(_, 0)).sum == 500)
  }

  test("messages never exceed increments") {
    val k = 8
    val bank = DistCounterBank(1, k, Array(0.3), seed = 3L)
    drive(bank, k, 20000, 13L)
    assert(bank.messages <= 20000L)
  }

  test("approximate mode saves messages at large counts") {
    val k = 8
    val bank = DistCounterBank(1, k, Array(0.3), seed = 4L)
    drive(bank, k, 50000, 14L)
    assert(bank.messages < 25000L, s"messages=${bank.messages}")
  }

  test("estimator is unbiased across seeds") {
    val k = 8
    val trials = 60
    val total = 20000
    val ests = (0 until trials).map { r =>
      val bank = DistCounterBank(1, k, Array(0.3), seed = 100L + r)
      drive(bank, k, total, 15L) // same stream, independent protocol coins
      bank.estimate(0)
    }
    val mean = ests.sum / trials
    // std of the mean ≈ eps*C/sqrt(2*trials) ≈ 0.3*20000/11 ≈ 550
    assert(math.abs(mean - total) < 1500, s"mean=$mean")
  }

  test("estimator variance respects the Lemma 4 bound") {
    val k = 8
    val trials = 80
    val total = 20000
    val eps = 0.3
    val ests = (0 until trials).map { r =>
      val bank = DistCounterBank(1, k, Array(eps), seed = 500L + r)
      drive(bank, k, total, 16L)
      bank.estimate(0)
    }
    val mean = ests.sum / trials
    val v = ests.map(e => (e - mean) * (e - mean)).sum / trials
    val bound = (eps * total) * (eps * total)
    assert(v <= bound * 1.5, s"var=$v bound=$bound") // 1.5 slack for sampling noise
  }

  test("runs are deterministic for a fixed seed") {
    val k = 4
    def go(seed: Long): (Double, Long) = {
      val bank = DistCounterBank(1, k, Array(0.2), seed)
      drive(bank, k, 30000, 17L)
      (bank.estimate(0), bank.messages)
    }
    assert(go(42L) == go(42L))
    assert(go(42L) != go(43L))
  }

  test("communication grows logarithmically once past the threshold") {
    val k = 4
    val eps = 0.5
    def messagesFor(total: Int, seed: Long): Long = {
      val bank = DistCounterBank(1, k, Array(eps), seed)
      drive(bank, k, total, 18L)
      bank.messages
    }
    val m1 = messagesFor(20000, 5L)
    val m2 = messagesFor(200000, 5L)
    // 10x the stream should cost far less than 10x the messages
    assert(m2 < m1 * 5, s"m1=$m1 m2=$m2")
  }

  test("per-counter independence: a busy counter does not affect an idle one") {
    val k = 4
    val bank = DistCounterBank(2, k, Array(0.3, 0.3), seed = 6L)
    drive(bank, k, 10000, 19L)
    assert(bank.estimate(1) == 0.0)
  }
}
