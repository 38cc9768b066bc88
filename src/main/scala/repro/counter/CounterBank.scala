package repro.counter

import repro.util.Rng

/** A bank of continuously-tracked distributed counters.
  *
  * `increment(site, c)` is called by site `site` when it observes one unit
  * for counter `c`; `estimate(c)` is the coordinator's current view;
  * `messages` is the total upstream communication (site → coordinator
  * messages, each carrying a single counter update — the unit the paper's
  * experiments count).
  */
trait CounterBank {
  def increment(site: Int, counter: Int): Unit
  def estimate(counter: Int): Double
  def messages: Long
}

/** EXACTMLE's counters: every increment is forwarded immediately, so the
  * coordinator always holds the exact counts and each increment costs one
  * message (Lemma 5: 2·n·m messages over m observations).
  */
final class ExactCounterBank(numCounters: Int) extends CounterBank {
  private val counts = new Array[Long](numCounters)
  private var msgs = 0L

  override def increment(site: Int, counter: Int): Unit = {
    counts(counter) += 1
    msgs += 1
  }

  override def estimate(counter: Int): Double = counts(counter).toDouble
  def count(counter: Int): Long = counts(counter)
  override def messages: Long = msgs
}

/** Coordinator state for randomized approximate distributed counters.
  *
  * Per (site, counter) it remembers the last reported local count and the
  * inverse reporting probability in force at that report; the per-site
  * estimator is `c̄ + 1/p − 1` (the expected unreported tail of a
  * geometric-with-success-p reporting process), which makes the total
  * estimate unbiased. `pFor` is the reporting probability the HYZ analysis
  * prescribes: with `p = pScale/(ε′·Ĉ)` the estimator's variance is at most
  * `k·(1/p)² = (ε′Ĉ)²·k/pScale²`, so `pScale = √(2k)` gives
  * `Var ≤ (ε′Ĉ)²/2 ≤ (ε′Ĉ)²` — the Lemma 4 guarantee.
  */
final class Coordinator(
    val numCounters: Int,
    val k: Int,
    val eps: Array[Double],
    val pScale: Double,
) extends Serializable {
  require(eps.length == numCounters, s"eps has ${eps.length} entries, expected $numCounters")
  require(eps.forall(_ > 0), "every counter needs a positive error parameter")

  private val est = new Array[Double](numCounters)
  private val lastRep = new Array[Int](k * numCounters)
  private val invP = new Array[Double](k * numCounters)
  private var msgs = 0L

  @inline private def idx(site: Int, counter: Int): Int = site * numCounters + counter

  /** One upstream message: site reports its exact local count, tagged with
    * the inverse probability it used for the send decision.
    */
  def receive(site: Int, counter: Int, localCount: Int, invPUsed: Double): Unit = {
    val j = idx(site, counter)
    val before = if (invP(j) == 0.0) 0.0 else lastRep(j) + invP(j) - 1.0
    lastRep(j) = localCount
    invP(j) = invPUsed
    est(counter) += (localCount + invPUsed - 1.0) - before
    msgs += 1
  }

  def estimate(counter: Int): Double = est(counter)
  def messages: Long = msgs

  /** Current reporting probability for `counter` given the coordinator view. */
  def pFor(counter: Int): Double =
    math.min(1.0, pScale / (eps(counter) * math.max(1.0, est(counter))))
}

object Coordinator {
  /** Variance-honoring reporting-probability scale (see class doc). */
  def theoryScale(k: Int): Double = math.sqrt(2.0 * k)
}

/** Sequential-driver bank over approximate counters: per-site local counts
  * plus the reporting probability each site currently knows for each
  * counter. The refreshed probability piggybacks on the acknowledgement of
  * each counted upstream message, so a site's `p` can be stale — that only
  * makes it report more often than necessary (conservative), never less
  * accurately. Coin flips are deterministic in (seed, site, counter,
  * localCount) so runs are replayable.
  */
final class DistCounterBank(
    numCounters: Int,
    k: Int,
    eps: Array[Double],
    seed: Long,
    pScale: Double,
) extends CounterBank {

  val coordinator = new Coordinator(numCounters, k, eps, pScale)
  private val local = new Array[Int](k * numCounters)
  private val pSite = new Array[Double](k * numCounters)
  java.util.Arrays.fill(pSite, 1.0)

  override def increment(site: Int, counter: Int): Unit = {
    val j = site * numCounters + counter
    local(j) += 1
    val p = pSite(j)
    if (p >= 1.0 || Rng.uniform(seed, j.toLong, local(j).toLong) < p) {
      coordinator.receive(site, counter, local(j), 1.0 / p)
      pSite(j) = coordinator.pFor(counter) // piggybacked ack
    }
  }

  override def estimate(counter: Int): Double = coordinator.estimate(counter)
  override def messages: Long = coordinator.messages
  def localCount(site: Int, counter: Int): Int = local(site * numCounters + counter)
}

object DistCounterBank {
  def apply(numCounters: Int, k: Int, eps: Array[Double], seed: Long): DistCounterBank =
    new DistCounterBank(numCounters, k, eps, seed, Coordinator.theoryScale(k))
}
