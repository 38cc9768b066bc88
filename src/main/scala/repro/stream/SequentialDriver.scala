package repro.stream

import repro.bn.{BayesianNetwork, Event}
import repro.core.BNModel
import repro.counter.{CounterBank, CounterLayout}

/** State of the monitored model after `m` observations.
  *
  * @param m         number of observations processed so far
  * @param messages  cumulative site → coordinator messages
  * @param estimates frozen copy of the coordinator's counter estimates
  */
final case class Snapshot(m: Long, messages: Long, estimates: Array[Double]) {
  def model(net: BayesianNetwork, layout: CounterLayout): BNModel =
    BNModel.fromArray(net, layout, estimates)
}

/** Event-by-event continuous-monitoring driver.
  *
  * This is exactly the experimental setup of Section 6: k sites and one
  * coordinator; each event arrives at its site, which runs Algorithm 2
  * (increment the two counters of every family); the bank decides which
  * increments turn into messages. Checkpoints snapshot the coordinator
  * state so accuracy-vs-m curves come from a single pass.
  */
object SequentialDriver {

  /** Process `events` in arrival order; snapshot after each checkpoint
    * (event counts, ascending). Always snapshots the end of the stream if
    * the last checkpoint does not cover it.
    */
  def run(layout: CounterLayout, bank: CounterBank, events: Iterator[Event],
          checkpoints: Seq[Long] = Seq.empty): Seq[Snapshot] = {
    val cps = checkpoints.sorted.iterator.buffered
    val out = Seq.newBuilder[Snapshot]
    var m = 0L
    def snap(): Unit =
      out += Snapshot(m, bank.messages,
        Array.tabulate(layout.numCounters)(bank.estimate))
    for (e <- events) {
      layout.foreachUpdate(e.x)(c => bank.increment(e.site, c))
      m += 1
      if (cps.hasNext && cps.head == m) { cps.next(); snap() }
    }
    if (checkpoints.isEmpty || checkpoints.max < m) snap()
    out.result()
  }
}
