package repro.jobs

import repro.eval.{Networks, Tables}

/** Prints Table 1 (networks used in the experiments): paper's values next
  * to our calibrated synthetic networks' actual values.
  */
object Table1 {
  def rows: Seq[Seq[String]] = Networks.all.map { net =>
    val (pn, pe, pp) = Networks.paperTable1(net.name)
    Seq(net.name, s"$pn/$pe/$pp", s"${net.n}/${net.numEdges}/${net.numParameters}")
  }

  def render: String = Tables.render(
    "Table 1: networks (nodes/edges/parameters)",
    Seq("dataset", "paper", "ours"),
    rows)

  def main(args: Array[String]): Unit = println(render)
}
