package repro.imaging

import org.scalatest.funsuite.AnyFunSuite

class RngSpec extends AnyFunSuite {

  test("streams are deterministic in the seed") {
    val a = new Rng(123); val b = new Rng(123)
    (0 until 100).foreach(_ => assert(a.nextLong() == b.nextLong()))
  }

  test("different seeds give different streams") {
    val a = new Rng(1); val b = new Rng(2)
    assert((0 until 10).exists(_ => a.nextLong() != b.nextLong()))
  }

  test("nextDouble stays in [0,1) and covers the range") {
    val r = new Rng(7)
    val xs = Seq.fill(10000)(r.nextDouble())
    assert(xs.forall(x => x >= 0.0 && x < 1.0))
    assert(xs.min < 0.01 && xs.max > 0.99)
    val mean = xs.sum / xs.size
    assert(math.abs(mean - 0.5) < 0.02, s"mean $mean")
  }

  test("uniform respects its bounds") {
    val r = new Rng(9)
    (0 until 1000).foreach { _ =>
      val v = r.uniform(-3.0, 5.5)
      assert(v >= -3.0 && v < 5.5)
    }
  }

  test("gaussian has ~zero mean and ~unit variance") {
    val r = new Rng(11)
    val xs = Seq.fill(20000)(r.nextGaussian())
    val mean = xs.sum / xs.size
    val varr = xs.map(x => (x - mean) * (x - mean)).sum / xs.size
    assert(math.abs(mean) < 0.03, s"mean $mean")
    assert(math.abs(varr - 1.0) < 0.05, s"var $varr")
  }

  test("mix is deterministic and sensitive to both arguments") {
    assert(Rng.mix(1, 2) == Rng.mix(1, 2))
    assert(Rng.mix(1, 2) != Rng.mix(2, 1))
    assert(Rng.mix(1, 2) != Rng.mix(1, 3))
  }
}
