package repro.util

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.{Prop, Test => SCTest}

/** ScalaCheck glue without the scalatestplus bridge (not in the offline
  * cache): run a Prop and assert it passed.
  */
trait CheckProp { self: AnyFunSuite =>
  def checkProp(prop: Prop, tests: Int = 100): Unit = {
    val res = SCTest.check(SCTest.Parameters.default.withMinSuccessfulTests(tests), prop)
    assert(res.passed, s"property failed: ${res.status}")
  }
}

class RngSpec extends AnyFunSuite with CheckProp {

  test("mix64 is deterministic") {
    assert(Rng.mix64(42L) == Rng.mix64(42L))
  }

  test("mix64 differs on adjacent inputs") {
    assert(Rng.mix64(1L) != Rng.mix64(2L))
  }

  test("hash is deterministic across coordinate arity") {
    assert(Rng.hash(1, 2, 3, 4) == Rng.hash(1, 2, 3, 4))
    assert(Rng.hash(1, 2) == Rng.hash(1, 2, 0, 0))
  }

  test("hash separates coordinates (no collisions on a small grid)") {
    val vals = for (a <- 0L to 20L; b <- 0L to 20L) yield Rng.hash(a, b)
    assert(vals.distinct.size == vals.size)
  }

  test("uniform lies in [0, 1)") {
    checkProp(Prop.forAll { (a: Long, b: Long) =>
      val u = Rng.uniform(a, b)
      u >= 0.0 && u < 1.0
    })
  }

  test("uniform mean is close to 1/2") {
    val n = 100000
    val mean = (0 until n).map(i => Rng.uniform(7L, i.toLong)).sum / n
    assert(math.abs(mean - 0.5) < 0.005, s"mean=$mean")
  }

  test("uniform variance is close to 1/12") {
    val n = 100000
    val xs = (0 until n).map(i => Rng.uniform(13L, i.toLong))
    val mean = xs.sum / n
    val v = xs.map(x => (x - mean) * (x - mean)).sum / n
    assert(math.abs(v - 1.0 / 12.0) < 0.005, s"var=$v")
  }

  test("uniform decorrelates across seeds") {
    val n = 20000
    val a = (0 until n).map(i => Rng.uniform(1L, i.toLong) - 0.5)
    val b = (0 until n).map(i => Rng.uniform(2L, i.toLong) - 0.5)
    val corr = a.zip(b).map { case (x, y) => x * y }.sum / n / (1.0 / 12.0)
    assert(math.abs(corr) < 0.03, s"corr=$corr")
  }

  test("uniformInt stays in range") {
    checkProp(Prop.forAll { (a: Long, b: Long) =>
      val v = Rng.uniformInt(7, a, b)
      v >= 0 && v < 7
    })
  }

  test("uniformInt covers all buckets roughly evenly") {
    val n = 70000
    val counts = (0 until n).map(i => Rng.uniformInt(7, 3L, i.toLong))
      .groupBy(identity).view.mapValues(_.size).toMap
    assert(counts.keySet == (0 until 7).toSet)
    counts.values.foreach(c => assert(math.abs(c - 10000) < 600, s"bucket=$c"))
  }

  test("uniformInt(1) is always 0 and rejects n <= 0") {
    assert(Rng.uniformInt(1, 5L, 6L) == 0)
    intercept[IllegalArgumentException](Rng.uniformInt(0, 1L, 2L))
  }
}
