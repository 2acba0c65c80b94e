package repro.util

import org.scalatest.funsuite.AnyFunSuite

class RngSpec extends AnyFunSuite {

  test("mix is deterministic") {
    assert(Rng.mix(42L) == Rng.mix(42L))
    assert(Rng.mix2(1L, 2L) == Rng.mix2(1L, 2L))
  }

  test("mix separates nearby inputs") {
    val outs = (0L until 1000L).map(Rng.mix).toSet
    assert(outs.size == 1000)
  }

  test("mix2 is order-sensitive") {
    assert(Rng.mix2(1L, 2L) != Rng.mix2(2L, 1L))
  }

  test("uniform stays in [0, 1)") {
    (0L until 10000L).foreach { i =>
      val u = Rng.uniform(i)
      assert(u >= 0.0 && u < 1.0)
    }
  }

  test("uniform mean is ~0.5") {
    val mean = (0L until 100000L).map(Rng.uniform).sum / 100000.0
    assert(math.abs(mean - 0.5) < 0.01, s"mean $mean")
  }

  test("gaussian has ~zero mean and ~unit variance") {
    val xs   = (0L until 100000L).map(i => Rng.gaussian(i * 7919L))
    val mean = xs.sum / xs.size
    val varr = xs.map(x => (x - mean) * (x - mean)).sum / xs.size
    assert(math.abs(mean) < 0.02, s"mean $mean")
    assert(math.abs(varr - 1.0) < 0.05, s"var $varr")
  }

  test("int stays in range and covers all values") {
    val draws = (0L until 10000L).map(i => Rng.int(i, 7))
    assert(draws.forall(d => d >= 0 && d < 7))
    assert(draws.toSet == (0 until 7).toSet)
  }

  test("int rejects non-positive n") {
    intercept[IllegalArgumentException] { Rng.int(1L, 0) }
  }

  test("int is roughly uniform") {
    val counts = (0L until 70000L).map(i => Rng.int(i, 7)).groupBy(identity).view.mapValues(_.size)
    counts.values.foreach(c => assert(math.abs(c - 10000) < 500, s"count $c"))
  }
}
