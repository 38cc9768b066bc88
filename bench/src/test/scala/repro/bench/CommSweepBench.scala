package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.eval.Networks
import repro.jobs.CommSweep

/** Figure 9's shape: communication vs stream length on ALARM. EXACTMLE is
  * linear in m; the approximate algorithms turn logarithmic once counters
  * cross their reporting thresholds.
  */
class CommSweepBench extends AnyFunSuite {

  private val ms: Seq[Long] = sys.env.getOrElse("REPRO_SWEEP_MS", "10000,50000,250000,1000000,4000000")
    .split(",").map(_.trim.toLong).toSeq

  test("communication vs training points on ALARM (Figure 9 shape)") {
    val rows = CommSweep.sweep(Networks.alarm, ms, BenchConfig.k, BenchConfig.eps,
      BenchConfig.seed, BenchConfig.pScale)
    println(repro.eval.Tables.render(
      s"Communication vs m (alarm, k=${BenchConfig.k}, eps=${BenchConfig.eps})",
      Seq("algorithm") ++ ms.map(m => s"m=$m"), rows))

    def row(name: String): Seq[Long] = rows.find(_.head == name).get.tail.map(_.toLong)
    val exact = row("exactmle")
    val nonuni = row("nonuniform")
    // exact is exactly linear
    assert(exact.last.toDouble / exact.head == ms.last.toDouble / ms.head)
    // The log-vs-linear separation needs counters to be well past their
    // reporting thresholds; only assert it at full sweep scale.
    if (ms.last >= 2000000L) {
      val mRatio = ms.last.toDouble / ms(ms.size - 2)
      val cRatio = nonuni.last.toDouble / nonuni(ms.size - 2)
      assert(cRatio < mRatio * 0.8, s"nonuniform grew x$cRatio over x$mRatio more data")
      assert(nonuni.last < exact.last / 2,
        s"nonuniform ${nonuni.last} vs exact ${exact.last} at m=${ms.last}")
    }
  }
}
