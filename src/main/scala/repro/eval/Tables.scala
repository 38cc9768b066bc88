package repro.eval

import org.apache.spark.sql.SparkSession
import repro.bn.{BayesianNetwork, ForwardSampler}
import repro.core.{BNModel, EpsilonAllocation, SuffStats}
import repro.counter.{Coordinator, CounterLayout, DistCounterBank}
import repro.stream.SequentialDriver

/** One algorithm's outcome on one dataset (one table cell group). */
final case class AlgoResult(
    algo: String,
    messages: Long,
    clsErr: Double,
    errVsTruth: Double,
    errVsMle: Double,
)

/** All four algorithms on one dataset — one row of Tables 2 and 3. */
final case class DatasetResult(dataset: String, m: Long, k: Int, eps: Double,
                               results: Seq[AlgoResult]) {
  def apply(algo: String): AlgoResult = results.find(_.algo == algo)
    .getOrElse(throw new NoSuchElementException(s"no result for $algo"))
}

/** Harness reproducing the paper's experimental grid (Section 6): for a
  * network, stream m forward-sampled observations to k uniformly chosen
  * sites, maintain the model with each algorithm, then evaluate 1000
  * conditional-probability test events and 1000 classification tests.
  *
  * The EXACTMLE model is computed with Spark (distributed family-count
  * aggregation); its communication is exactly `updatesPerEvent · m`
  * messages (Lemma 5). The approximate algorithms run the monitoring
  * protocol per-event; their metrics are medians over `runs` independent
  * seeds, as in the paper (median of five runs).
  */
object Tables {

  val algoNames = Seq("exactmle", "baseline", "uniform", "nonuniform")

  def allocations(eps: Double, net: BayesianNetwork): Seq[EpsilonAllocation] = Seq(
    EpsilonAllocation.Baseline(eps, net.n),
    EpsilonAllocation.Uniform(eps, net.n),
    EpsilonAllocation.NonUniform(eps, net),
  )

  /** @param pScale reporting-probability scale of the distributed counters;
    *               None = the variance-honoring √(2k) (Lemma 4). Smaller
    *               values trade per-counter accuracy for communication —
    *               used to calibrate against the paper's implementation
    *               constants (see EXPERIMENTS.md).
    */
  def runDataset(spark: SparkSession, net: BayesianNetwork, m: Long, k: Int,
                 eps: Double, seed: Long, nTests: Int, runs: Int,
                 pScale: Option[Double] = None): DatasetResult = {
    val scale = pScale.getOrElse(Coordinator.theoryScale(k))
    val layout = CounterLayout.standard(net)
    val queries = TestQueries.condQueries(net, nTests, minProb = 0.01, seed = seed)
    val tests = TestQueries.clsTests(net, nTests, seed)

    // EXACTMLE: Spark aggregation of exact sufficient statistics.
    val events = ForwardSampler.events(spark, net, m, k, seed)
    val exactModel = SuffStats.exactModel(spark, net, layout, events)
    val exactRes = AlgoResult(
      "exactmle",
      messages = layout.updatesPerEvent.toLong * m,
      clsErr = Metrics.classificationError(exactModel, tests),
      errVsTruth = Metrics.relErrVsTruth(exactModel, queries),
      errVsMle = 0.0,
    )

    val approx = allocations(eps, net).map { alloc =>
      val perRun = (0 until runs).map { r =>
        val bank = new DistCounterBank(layout.numCounters, k, alloc.epsArray(layout),
          seed + 7919L * (r + 1), scale)
        val snap = SequentialDriver.run(layout, bank, ForwardSampler.localEvents(net, m, k, seed)).last
        val model = snap.model(net, layout)
        (snap.messages, Metrics.classificationError(model, tests),
          Metrics.relErrVsTruth(model, queries), Metrics.relErrVsRef(model, exactModel, queries))
      }
      AlgoResult(
        alloc.name,
        messages = Metrics.median(perRun.map(_._1.toDouble)).round,
        clsErr = Metrics.median(perRun.map(_._2)),
        errVsTruth = Metrics.median(perRun.map(_._3)),
        errVsMle = Metrics.median(perRun.map(_._4)),
      )
    }

    DatasetResult(net.name, m, k, eps, exactRes +: approx)
  }

  /** Communication-only run (no model evaluation): message counts of the
    * three approximate algorithms over one protocol seed, plus EXACTMLE's
    * analytic `2·n·m`. Used for the calibrated-profile Table 3 companion.
    */
  def commOnly(net: BayesianNetwork, m: Long, k: Int, eps: Double, seed: Long,
               pScale: Double): Map[String, Long] = {
    val layout = CounterLayout.standard(net)
    val approx = allocations(eps, net).map { alloc =>
      val bank = new DistCounterBank(layout.numCounters, k, alloc.epsArray(layout), seed, pScale)
      alloc.name -> SequentialDriver.run(layout, bank,
        ForwardSampler.localEvents(net, m, k, seed)).last.messages
    }
    (("exactmle" -> layout.updatesPerEvent.toLong * m) +: approx).toMap
  }

  /** Fixed-width table printer: header row + one line per dataset. */
  def render(title: String, header: Seq[String], rows: Seq[Seq[String]]): String = {
    val all = header +: rows
    val widths = header.indices.map(c => all.map(_(c).length).max)
    def line(r: Seq[String]): String =
      r.zip(widths).map { case (cell, w) => cell.padTo(w, ' ') }.mkString("  ")
    (s"== $title ==" +: line(header) +: rows.map(line)).mkString("\n")
  }
}
