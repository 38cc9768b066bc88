package repro.jobs

import repro.bn.ForwardSampler
import repro.counter.{CounterLayout, DistCounterBank}
import repro.eval.{Networks, Tables}
import repro.stream.SequentialDriver

/** Diagnostic: UNIFORM vs NONUNIFORM messages on NEW-ALARM across m and
  * counter profiles.
  */
object DebugNewAlarm {
  def main(args: Array[String]): Unit = {
    val net = Networks.newAlarm
    val layout = CounterLayout.standard(net)
    val k = 30
    for (scale <- Seq(0.05, 0.5); m <- Seq(200000L, 1000000L, 4000000L)) {
      val msgs = Tables.allocations(0.1, net).map { alloc =>
        val bank = new DistCounterBank(layout.numCounters, k, alloc.epsArray(layout), 42L, scale)
        val s = SequentialDriver.run(layout, bank, ForwardSampler.localEvents(net, m, k, 42L)).last
        alloc.name -> s.messages
      }.toMap
      println(f"scale=$scale m=$m uniform=${msgs("uniform")} nonuniform=${msgs("nonuniform")} " +
        f"ratio=${msgs("nonuniform").toDouble / msgs("uniform")}%.3f")
    }
  }
}
