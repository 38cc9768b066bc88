package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.eval.Networks
import repro.jobs.Table1

/** Paper Table 1: the evaluation networks. Prints paper vs calibrated
  * synthetic values and asserts the structural match.
  */
class Table1Bench extends AnyFunSuite {

  test("Table 1: networks used in the experiments") {
    println(Table1.render)
    for (net <- Networks.all) {
      val (pn, pe, pp) = Networks.paperTable1(net.name)
      assert(net.n == pn, s"${net.name} node count")
      assert(net.numEdges == pe, s"${net.name} edge count")
      assert(net.numParameters >= pp && net.numParameters <= (pp * 1.25).toLong,
        s"${net.name} parameters ${net.numParameters} vs paper $pp")
    }
  }
}
