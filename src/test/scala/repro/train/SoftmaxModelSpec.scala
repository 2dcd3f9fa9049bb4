package repro.train

import org.scalatest.funsuite.AnyFunSuite

import repro.imaging.Rng

class SoftmaxModelSpec extends AnyFunSuite {

  test("init produces zero parameters of the right shape") {
    val p = SoftmaxModel.init(3, 4)
    assert(p.theta.length == 3 * 4 + 3)
    assert(p.theta.forall(_ == 0.0))
  }

  test("zero parameters give uniform loss log(C)") {
    val p = SoftmaxModel.init(5, 2)
    val g = new Array[Double](p.theta.length)
    val loss = SoftmaxModel.accumulate(p, Array(1.0, -1.0), 2, g)
    assert(math.abs(loss - math.log(5.0)) < 1e-12)
  }

  test("analytic gradient matches finite differences") {
    val rng = new Rng(3)
    val nC = 3; val d = 5
    val p = SoftmaxParams(nC, d, Array.fill(nC * d + nC)(rng.nextGaussian() * 0.1))
    val x = Array.fill(d)(rng.nextGaussian())
    val label = 1
    val g = new Array[Double](p.theta.length)
    SoftmaxModel.accumulate(p, x, label, g)
    val eps = 1e-6
    for (i <- p.theta.indices) {
      def lossAt(t: Array[Double]): Double = {
        val tmp = new Array[Double](t.length)
        SoftmaxModel.accumulate(SoftmaxParams(nC, d, t), x, label, tmp)
      }
      val tPlus = p.theta.clone(); tPlus(i) += eps
      val tMinus = p.theta.clone(); tMinus(i) -= eps
      val num = (lossAt(tPlus) - lossAt(tMinus)) / (2 * eps)
      assert(math.abs(num - g(i)) < 1e-5, s"param $i: analytic ${g(i)} vs numeric $num")
    }
  }

  test("gradient accumulates across examples") {
    val p = SoftmaxModel.init(2, 2)
    val g1 = new Array[Double](p.theta.length)
    SoftmaxModel.accumulate(p, Array(1.0, 0.0), 0, g1)
    SoftmaxModel.accumulate(p, Array(0.0, 1.0), 1, g1)
    val g2 = new Array[Double](p.theta.length)
    SoftmaxModel.accumulate(p, Array(0.0, 1.0), 1, g2)
    SoftmaxModel.accumulate(p, Array(1.0, 0.0), 0, g2)
    assert(g1.zip(g2).forall { case (a, b) => math.abs(a - b) < 1e-12 })
  }

  test("gradient descent learns linearly separable data") {
    val rng = new Rng(7)
    val data = (0 until 200).map { i =>
      val label = i % 2
      val x = Array(rng.nextGaussian() + (if (label == 0) -2.0 else 2.0), rng.nextGaussian())
      (x, label)
    }
    var p = SoftmaxModel.init(2, 2)
    for (_ <- 0 until 100) {
      val g = new Array[Double](p.theta.length)
      data.foreach { case (x, y) => SoftmaxModel.accumulate(p, x, y, g) }
      g.indices.foreach(i => g(i) /= data.size)
      p = SoftmaxModel.step(p, g, lr = 1.0, l2 = 0.0)
    }
    val acc = data.count { case (x, y) => SoftmaxModel.predict(p, x) == y }.toDouble / data.size
    assert(acc > 0.95, s"accuracy $acc")
  }

  test("L2 regularization shrinks weights") {
    val p = SoftmaxParams(2, 1, Array(10.0, -10.0, 0.0, 0.0))
    val zeroGrad = new Array[Double](4)
    val p2 = SoftmaxModel.step(p, zeroGrad, lr = 0.1, l2 = 1.0)
    assert(math.abs(p2.theta(0)) < math.abs(p.theta(0)))
    assert(math.abs(p2.theta(1)) < math.abs(p.theta(1)))
  }

  test("feature-dimension mismatch is rejected") {
    val p = SoftmaxModel.init(2, 3)
    assertThrows[IllegalArgumentException](SoftmaxModel.predict(p, Array(1.0)))
  }
}
