package repro.jobs

import repro.eval.Networks

/** Diagnostic: predicted UNIFORM vs NONUNIFORM communication ratios from
  * the asymptotic cost model (child-counter term), per network.
  */
object DebugGamma {
  def main(args: Array[String]): Unit = {
    for (net <- Networks.all :+ Networks.newAlarm) {
      val jk = (0 until net.n).map(i => net.card(i).toDouble * net.parentCard(i))
      val n = net.n
      val uniformCost = 16 * math.sqrt(n) * jk.sum
      val nonUniformCost = 16 * math.pow(jk.map(math.pow(_, 2.0 / 3)).sum, 1.5)
      val ks = (0 until net.n).map(i => net.parentCard(i).toDouble)
      val uniParent = 16 * math.sqrt(n) * ks.sum
      val nonParent = 16 * math.pow(ks.map(math.pow(_, 2.0 / 3)).sum, 1.5)
      println(f"${net.name}%-10s child N/U=${nonUniformCost / uniformCost}%.3f " +
        f"parent N/U=${nonParent / uniParent}%.3f " +
        f"total N/U=${(nonUniformCost + nonParent) / (uniformCost + uniParent)}%.3f " +
        f"maxJK=${jk.max}%.0f sumJK=${jk.sum}%.0f")
    }
  }
}
