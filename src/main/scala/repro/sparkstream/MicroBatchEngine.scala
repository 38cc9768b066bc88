package repro.sparkstream

import org.apache.spark.sql.{Dataset, SparkSession}
import repro.bn.{BayesianNetwork, Event}
import repro.core.{BNModel, EpsilonAllocation}
import repro.counter.{Coordinator, CounterLayout}
import repro.util.Rng

/** One record emitted by a site partition during a micro-batch.
  *
  * `kind = 0`: a counted protocol message — site reports the exact local
  * count of one counter (with the inverse reporting probability used).
  * `kind = 1`: end-of-batch state carry for a touched counter (not a
  * protocol message; in a real deployment this state never leaves the
  * site — here it rides back to the driver so the next batch can resume).
  */
final case class BatchOut(kind: Int, site: Int, counter: Int, localCount: Int,
                          invP: Double, eventId: Long)

/** Spark micro-batch realization of the continuous monitoring protocol.
  *
  * Each batch is grouped by site; every site partition replays its events
  * in arrival order against its carried local-counter state, flipping the
  * protocol's per-increment coins with the reporting probabilities the
  * coordinator published at the start of the batch. Only chosen counter
  * updates come back as messages; the driver plays the coordinator,
  * folding them (in arrival order) into the global estimates. This is the
  * "incremental aggregation that minimizes shuffle/communication" mapping:
  * the rows shuffled to the driver are exactly the protocol's messages.
  *
  * Compared with the sequential driver, the only semantic difference is
  * that reporting probabilities refresh at batch boundaries instead of on
  * each acknowledgement — a standard latency/communication tradeoff that
  * preserves unbiasedness of the per-site estimator.
  */
final class MicroBatchEngine(
    val net: BayesianNetwork,
    val layout: CounterLayout,
    allocation: EpsilonAllocation,
    val k: Int,
    seed: Long,
    pScale: Double,
) {

  val coordinator = new Coordinator(layout.numCounters, k, allocation.epsArray(layout), pScale)
  private val siteLocal: Array[Array[Int]] = Array.fill(k)(new Array[Int](layout.numCounters))
  private var processed = 0L

  def messages: Long = coordinator.messages
  def eventsProcessed: Long = processed
  def model: BNModel = new BNModel(net, layout, coordinator.estimate)

  /** Process one micro-batch of events. Returns messages emitted by it. */
  def processBatch(spark: SparkSession, batch: Dataset[Event]): Long = {
    import spark.implicits._
    val before = coordinator.messages
    val pArr = Array.tabulate(layout.numCounters)(coordinator.pFor)
    val bcP = spark.sparkContext.broadcast(pArr)
    val bcLocal = spark.sparkContext.broadcast(siteLocal)
    val bcLayout = spark.sparkContext.broadcast(layout)
    val localSeed = seed

    val out: Array[BatchOut] = batch
      .groupByKey(_.site)
      .flatMapGroups { (site: Int, it: Iterator[Event]) =>
        val lay = bcLayout.value
        val p = bcP.value
        val local = bcLocal.value(site).clone()
        val touched = new java.util.HashSet[Integer]()
        val msgs = Array.newBuilder[BatchOut]
        val evs = it.toArray.sortBy(_.id)
        evs.foreach { e =>
          lay.foreachUpdate(e.x) { c =>
            local(c) += 1
            touched.add(c)
            val pc = p(c)
            if (pc >= 1.0 || Rng.uniform(localSeed, (site.toLong << 32) | c.toLong, local(c).toLong) < pc) {
              msgs += BatchOut(0, site, c, local(c), 1.0 / pc, e.id)
            }
          }
        }
        val states = touched.iterator()
        val stateOut = Array.newBuilder[BatchOut]
        while (states.hasNext) {
          val c = states.next().intValue()
          stateOut += BatchOut(1, site, c, local(c), 0.0, -1L)
        }
        stateOut += BatchOut(2, site, -1, evs.length, 0.0, -1L) // per-site event tally
        (msgs.result() ++ stateOut.result()).iterator
      }
      .collect()

    bcP.destroy(); bcLocal.destroy(); bcLayout.destroy()

    // Coordinator folds the protocol messages in arrival order.
    out.filter(_.kind == 0).sortBy(o => (o.eventId, o.counter)).foreach { o =>
      coordinator.receive(o.site, o.counter, o.localCount, o.invP)
    }
    // Carry site state for the next batch.
    out.filter(_.kind == 1).foreach(o => siteLocal(o.site)(o.counter) = o.localCount)
    processed += out.filter(_.kind == 2).map(_.localCount.toLong).sum
    coordinator.messages - before
  }

  /** Process a whole bounded stream in `numBatches` arrival-order slices. */
  def run(spark: SparkSession, events: Dataset[Event], m: Long, numBatches: Int): Unit = {
    val per = math.max(1L, (m + numBatches - 1) / numBatches)
    var lo = 0L
    while (lo < m) {
      val hi = math.min(m, lo + per)
      processBatch(spark, events.filter(e => e.id >= lo && e.id < hi))
      lo = hi
    }
  }
}

object MicroBatchEngine {
  def apply(net: BayesianNetwork, layout: CounterLayout, allocation: EpsilonAllocation,
            k: Int, seed: Long): MicroBatchEngine =
    new MicroBatchEngine(net, layout, allocation, k, seed, Coordinator.theoryScale(k))
}
