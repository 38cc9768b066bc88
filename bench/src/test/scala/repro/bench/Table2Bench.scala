package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.jobs.Table2And3

/** Paper Table 2: Bayesian classification error rate at 50K training
  * instances, four datasets × four algorithms.
  */
class Table2Bench extends AnyFunSuite {

  test("Table 2: classification error rate (paper vs ours)") {
    val grid = BenchConfig.grid
    println(Table2And3.renderTable2(grid))
    for (r <- grid) {
      val exactErr = r("exactmle").clsErr
      // Sanity: rates are valid and the approximate algorithms track the
      // exact MLE closely, as in the paper (columns differ by ≲ 0.02 there).
      r.results.foreach(a => assert(a.clsErr >= 0.0 && a.clsErr <= 1.0, s"${r.dataset}/${a.algo}"))
      for (a <- Seq("baseline", "uniform", "nonuniform")) {
        assert(math.abs(r(a).clsErr - exactErr) < 0.05,
          s"${r.dataset}/$a clsErr ${r(a).clsErr} vs exact $exactErr")
      }
    }
  }
}
