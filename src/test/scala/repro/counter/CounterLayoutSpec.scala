package repro.counter

import org.scalatest.funsuite.AnyFunSuite
import repro.bn.{NetworkGenerator, TestNets}

class CounterLayoutSpec extends AnyFunSuite {
  private val chain = TestNets.chain
  private val layout = CounterLayout.standard(chain)

  test("standard layout counts all counters: Σ(JᵢKᵢ + Kᵢ)") {
    // chain: (2*1+1) + (3*2+2) + (2*3+3) = 3 + 8 + 9 = 20
    assert(layout.numCounters == 20)
  }

  test("child and parent counter ids are a bijection onto [0, numCounters)") {
    val ids = (for {
      i <- 0 until chain.n
      u <- 0 until chain.parentCard(i)
      v <- -1 until chain.card(i) // v = -1 stands for the parent counter
    } yield if (v == -1) layout.parentCounter(i, u) else layout.childCounter(i, v, u)).toSeq
    assert(ids.sorted == (0 until layout.numCounters).toSeq)
  }

  test("foreachFamily yields one (child, parent) pair per variable") {
    val pairs = Seq.newBuilder[(Int, Int)]
    layout.foreachFamily(Array(1, 2, 0))((c, p) => pairs += ((c, p)))
    val got = pairs.result()
    assert(got.size == 3)
    assert(got(0) == ((layout.childCounter(0, 1, 0), layout.parentCounter(0, 0))))
    assert(got(1) == ((layout.childCounter(1, 2, 1), layout.parentCounter(1, 1))))
    assert(got(2) == ((layout.childCounter(2, 0, 2), layout.parentCounter(2, 2))))
  }

  test("updatesPerEvent is 2n for the standard layout") {
    assert(layout.updatesPerEvent == 6)
  }

  test("foreachUpdate visits 2n distinct counters in the standard layout") {
    val seen = Seq.newBuilder[Int]
    layout.foreachUpdate(Array(0, 1, 1))(seen += _)
    val got = seen.result()
    assert(got.size == 6)
    assert(got.distinct.size == 6)
  }

  test("standard layout on a larger generated network stays consistent") {
    val net = TestNets.random20
    val lay = CounterLayout.standard(net)
    val expected = (0 until net.n).map(i => net.card(i) * net.parentCard(i) + net.parentCard(i)).sum
    assert(lay.numCounters == expected)
    // spot-check id ranges
    for (i <- 0 until net.n) {
      assert(lay.childCounter(i, 0, 0) >= 0)
      assert(lay.parentCounter(i, net.parentCard(i) - 1) < lay.numCounters)
    }
  }

  private val nb = NetworkGenerator.naiveBayes("nb", 4, classCard = 3,
    featureCards = Array(2, 4, 2), seed = 21L)
  private val nbLayout = CounterLayout.naiveBayes(nb)

  test("naiveBayes layout shares one parent block across features") {
    val sharedIds = (0 until 3).map(u => nbLayout.parentCounter(1, u))
    (2 until 4).foreach { i =>
      assert((0 until 3).map(u => nbLayout.parentCounter(i, u)) == sharedIds)
    }
    // the root's child block IS the shared block
    assert((0 until 3).map(v => nbLayout.childCounter(0, v, 0)) == sharedIds)
  }

  test("naiveBayes layout size: feature child blocks + shared + total") {
    // features: 2*3 + 4*3 + 2*3 = 24; shared J0 = 3; total = 1 → 28
    assert(nbLayout.numCounters == 28)
  }

  test("naiveBayes foreachUpdate increments the shared counter once per event") {
    val counts = scala.collection.mutable.Map.empty[Int, Int].withDefaultValue(0)
    nbLayout.foreachUpdate(Array(2, 1, 3, 0))(c => counts(c) += 1)
    // updates: 3 feature child counters + shared(x0=2) + total = 5 distinct
    assert(counts.values.forall(_ == 1), s"duplicated increments: $counts")
    assert(counts.size == 5)
    assert(counts.contains(nbLayout.childCounter(0, 2, 0)))
    assert(counts.contains(nbLayout.parentCounter(0, 0)))
  }

  test("naiveBayes updatesPerEvent reflects sharing") {
    assert(nbLayout.updatesPerEvent == 5)
  }

  test("naiveBayes layout rejects non-NB networks") {
    intercept[IllegalArgumentException](CounterLayout.naiveBayes(TestNets.chain))
  }
}
