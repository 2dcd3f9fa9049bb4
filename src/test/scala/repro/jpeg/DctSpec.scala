package repro.jpeg

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.{Gen, Prop}

import repro.PropSupport

class DctSpec extends AnyFunSuite with PropSupport {

  private val blockGen: Gen[Array[Double]] =
    Gen.containerOfN[Array, Double](64, Gen.choose(-128.0, 127.0))

  test("forward then inverse is the identity (orthonormal transform)") {
    checkProp(Prop.forAll(blockGen) { b =>
      val r = Dct.inverse(Dct.forward(b))
      b.zip(r).forall { case (x, y) => math.abs(x - y) < 1e-9 }
    })
  }

  test("inverse then forward is the identity") {
    checkProp(Prop.forAll(blockGen) { b =>
      val r = Dct.forward(Dct.inverse(b))
      b.zip(r).forall { case (x, y) => math.abs(x - y) < 1e-9 }
    })
  }

  test("transform preserves energy (Parseval)") {
    checkProp(Prop.forAll(blockGen) { b =>
      val f = Dct.forward(b)
      val e1 = b.map(x => x * x).sum
      val e2 = f.map(x => x * x).sum
      math.abs(e1 - e2) < 1e-6 * math.max(1.0, e1)
    })
  }

  test("DC coefficient of a constant block is 8 × the value") {
    val b = Array.fill(64)(10.0)
    val f = Dct.forward(b)
    assert(math.abs(f(0) - 80.0) < 1e-9)
    f.drop(1).foreach(v => assert(math.abs(v) < 1e-9))
  }

  test("linearity") {
    checkProp(Prop.forAll(blockGen, blockGen) { (a, b) =>
      val sum = a.zip(b).map { case (x, y) => x + y }
      val fs = Dct.forward(sum)
      val fa = Dct.forward(a); val fb = Dct.forward(b)
      fs.indices.forall(i => math.abs(fs(i) - fa(i) - fb(i)) < 1e-8)
    })
  }

  test("rejects wrong-sized blocks") {
    assertThrows[IllegalArgumentException](Dct.forward(new Array[Double](63)))
    assertThrows[IllegalArgumentException](Dct.inverse(new Array[Double](65)))
  }

  test("a pure basis function concentrates into one coefficient") {
    val u0 = 3; val v0 = 5
    val block = Array.tabulate(64) { i =>
      val x = i / 8; val y = i % 8
      math.cos((2 * x + 1) * u0 * math.Pi / 16) * math.cos((2 * y + 1) * v0 * math.Pi / 16)
    }
    val f = Dct.forward(block)
    f.indices.filter(_ != u0 * 8 + v0).foreach(i => assert(math.abs(f(i)) < 1e-9))
    assert(math.abs(f(u0 * 8 + v0)) > 1.0)
  }
}
