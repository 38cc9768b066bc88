package repro.eval

import repro.bn.{BayesianNetwork, NetworkGenerator}

/** The paper's evaluation networks, rebuilt synthetically.
  *
  * Each network matches the paper's Table 1 node and edge counts exactly
  * and calibrates cardinalities so the free-parameter count Σ(Jᵢ−1)·Kᵢ
  * reaches the paper's value (slight overshoot possible — reported in
  * EXPERIMENTS.md). Seeds are fixed so every run sees the same networks.
  */
object Networks {

  /** Paper's Table 1 reference values: (nodes, edges, parameters). */
  val paperTable1: Map[String, (Int, Int, Long)] = Map(
    "alarm" -> (37, 46, 509L),
    "hepar2" -> (70, 123, 1453L),
    "link" -> (724, 1125, 14211L),
    "munin" -> (1041, 1397, 80592L),
  )

  lazy val alarm: BayesianNetwork =
    NetworkGenerator.calibrated("alarm", 37, 46, 509L, maxCard = 4, maxParents = 4, seed = 101L)

  lazy val hepar2: BayesianNetwork =
    NetworkGenerator.calibrated("hepar2", 70, 123, 1453L, maxCard = 4, maxParents = 4, seed = 102L)

  lazy val link: BayesianNetwork =
    NetworkGenerator.calibrated("link", 724, 1125, 14211L, maxCard = 6, maxParents = 3, seed = 103L)

  lazy val munin: BayesianNetwork =
    NetworkGenerator.calibrated("munin", 1041, 1397, 80592L, maxCard = 12, maxParents = 3, seed = 104L)

  /** NEW-ALARM: ALARM's structure with 6 variables forced to cardinality 20
    * (Section 6.2's semi-synthetic network for the UNIFORM-vs-NONUNIFORM
    * communication comparison).
    */
  lazy val newAlarm: BayesianNetwork = NetworkGenerator.widen(alarm, nWide = 6, wideCard = 20, seed = 105L)

  /** All four Table 1 networks in the paper's order. */
  def all: Seq[BayesianNetwork] = Seq(alarm, hepar2, link, munin)
}
