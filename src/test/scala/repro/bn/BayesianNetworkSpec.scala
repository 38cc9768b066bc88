package repro.bn

import org.scalatest.funsuite.AnyFunSuite

/** Tiny hand-built networks used across suites. */
object TestNets {

  /** Chain X0 → X1 → X2 with cards (2, 3, 2) and hand-set CPTs. */
  val chain: BayesianNetwork = new BayesianNetwork(
    "chain",
    card = Array(2, 3, 2),
    parents = Array(Array.empty[Int], Array(0), Array(1)),
    cpt = Array(
      Array(Array(0.3, 0.7)),
      Array(Array(0.2, 0.3, 0.5), Array(0.6, 0.3, 0.1)),
      Array(Array(0.9, 0.1), Array(0.5, 0.5), Array(0.2, 0.8)),
    ),
  )

  /** Collider: X0 → X2 ← X1, cards (2, 2, 2). */
  val collider: BayesianNetwork = new BayesianNetwork(
    "collider",
    card = Array(2, 2, 2),
    parents = Array(Array.empty[Int], Array.empty[Int], Array(0, 1)),
    cpt = Array(
      Array(Array(0.4, 0.6)),
      Array(Array(0.25, 0.75)),
      Array(Array(0.9, 0.1), Array(0.6, 0.4), Array(0.3, 0.7), Array(0.05, 0.95)),
    ),
  )

  /** A near-deterministic classifier net: X0 → X1, X0 → X2; features copy
    * the class value with probability 0.95.
    */
  val copier: BayesianNetwork = new BayesianNetwork(
    "copier",
    card = Array(2, 2, 2),
    parents = Array(Array.empty[Int], Array(0), Array(0)),
    cpt = Array(
      Array(Array(0.5, 0.5)),
      Array(Array(0.95, 0.05), Array(0.05, 0.95)),
      Array(Array(0.95, 0.05), Array(0.05, 0.95)),
    ),
  )

  /** Mid-size random net for statistical tests (seeded, so stable). */
  lazy val random20: BayesianNetwork =
    NetworkGenerator.random("rand20", n = 20, edges = 30, maxCard = 4, maxParents = 3, seed = 7L)
}

class BayesianNetworkSpec extends AnyFunSuite {
  import TestNets._

  test("n, edges and parameter count of the chain") {
    assert(chain.n == 3)
    assert(chain.numEdges == 2)
    // (2-1)*1 + (3-1)*2 + (2-1)*3 = 1 + 4 + 3
    assert(chain.numParameters == 8L)
  }

  test("parentCard multiplies parent cardinalities") {
    assert(chain.parentCard.toSeq == Seq(1, 2, 3))
    assert(collider.parentCard.toSeq == Seq(1, 1, 4))
  }

  test("parentCode encodes mixed radix over parents") {
    // collider node 2 has parents (0, 1); code = x0 * card(1) + x1 = x0*2 + x1
    assert(collider.parentCode(2, Array(0, 0, 0)) == 0)
    assert(collider.parentCode(2, Array(0, 1, 0)) == 1)
    assert(collider.parentCode(2, Array(1, 0, 0)) == 2)
    assert(collider.parentCode(2, Array(1, 1, 1)) == 3)
  }

  test("parentCode of a root is always 0") {
    assert(chain.parentCode(0, Array(1, 2, 1)) == 0)
  }

  test("decodeParentCode inverts parentCode on every assignment") {
    val net = random20
    for (trial <- 0 until 50) {
      val x = net.sample(99L, trial.toLong)
      for (i <- 0 until net.n) {
        val code = net.parentCode(i, x)
        val dec = net.decodeParentCode(i, code)
        assert(dec.toSeq == net.parents(i).map(x(_)).toSeq, s"node $i")
      }
    }
  }

  test("children lists are the transpose of parents") {
    assert(chain.children(0).toSeq == Seq(1))
    assert(chain.children(1).toSeq == Seq(2))
    assert(chain.children(2).isEmpty)
    assert(collider.children(0).toSeq == Seq(2))
    assert(collider.children(1).toSeq == Seq(2))
  }

  test("jointProb multiplies CPD entries") {
    // P(0,1,0) = 0.3 * 0.3 * 0.5
    assert(math.abs(chain.jointProb(Array(0, 1, 0)) - 0.3 * 0.3 * 0.5) < 1e-12)
  }

  test("jointProb sums to 1 over the full domain") {
    val total = (for (a <- 0 until 2; b <- 0 until 3; c <- 0 until 2)
      yield chain.jointProb(Array(a, b, c))).sum
    assert(math.abs(total - 1.0) < 1e-9)
  }

  test("sample is deterministic in (seed, id)") {
    assert(chain.sample(5L, 17L).toSeq == chain.sample(5L, 17L).toSeq)
    assert(random20.sample(5L, 17L).toSeq == random20.sample(5L, 17L).toSeq)
  }

  test("sample varies across ids") {
    val draws = (0 until 100).map(i => chain.sample(5L, i.toLong).toSeq).distinct
    assert(draws.size > 3)
  }

  test("sampled values stay inside their domains") {
    val net = random20
    for (id <- 0 until 200) {
      val x = net.sample(3L, id.toLong)
      for (i <- 0 until net.n) assert(x(i) >= 0 && x(i) < net.card(i))
    }
  }

  test("empirical root marginal matches the CPT") {
    val m = 50000
    val ones = (0 until m).count(i => chain.sample(11L, i.toLong)(0) == 1)
    assert(math.abs(ones.toDouble / m - 0.7) < 0.01)
  }

  test("empirical conditional matches the CPT") {
    val m = 50000
    val draws = (0 until m).map(i => chain.sample(12L, i.toLong))
    val given0 = draws.filter(_(0) == 0)
    val p1 = given0.count(_(1) == 1).toDouble / given0.size
    assert(math.abs(p1 - 0.3) < 0.02, s"P(x1=1|x0=0)=$p1")
  }

  test("constructor rejects a parent after its child") {
    intercept[IllegalArgumentException] {
      new BayesianNetwork("bad", Array(2, 2), Array(Array(1), Array.empty[Int]),
        Array(Array(Array(0.5, 0.5), Array(0.5, 0.5)), Array(Array(0.5, 0.5))))
    }
  }

  test("constructor rejects a CPT row that does not sum to 1") {
    intercept[IllegalArgumentException] {
      new BayesianNetwork("bad", Array(2), Array(Array.empty[Int]),
        Array(Array(Array(0.5, 0.6))))
    }
  }

  test("constructor rejects CPT with wrong number of rows") {
    intercept[IllegalArgumentException] {
      new BayesianNetwork("bad", Array(2, 2), Array(Array.empty[Int], Array(0)),
        Array(Array(Array(0.5, 0.5)), Array(Array(0.5, 0.5)))) // needs K=2 rows for node 1
    }
  }
}
