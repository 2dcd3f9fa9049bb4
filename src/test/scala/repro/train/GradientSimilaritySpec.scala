package repro.train

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.{Gen, Prop}

import repro.PropSupport

class GradientSimilaritySpec extends AnyFunSuite with PropSupport {

  test("cosine of a vector with itself is 1") {
    val vecGen = Gen.nonEmptyListOf(Gen.choose(-10.0, 10.0)).map(_.toArray)
      .suchThat(v => v.exists(_ != 0.0))
    checkProp(Prop.forAll(vecGen) { v =>
      math.abs(GradientSimilarity.cosine(v, v) - 1.0) < 1e-9
    }, n = 50)
  }

  test("cosine of opposite vectors is -1") {
    val v = Array(1.0, -2.0, 3.0)
    assert(math.abs(GradientSimilarity.cosine(v, v.map(-_)) + 1.0) < 1e-12)
  }

  test("cosine of orthogonal vectors is 0") {
    assert(math.abs(GradientSimilarity.cosine(Array(1.0, 0.0), Array(0.0, 5.0))) < 1e-12)
  }

  test("cosine is scale invariant") {
    checkProp(Prop.forAll(Gen.choose(0.1, 100.0)) { s =>
      val a = Array(1.0, 2.0, -3.0)
      val b = Array(0.5, -1.0, 2.0)
      math.abs(GradientSimilarity.cosine(a, b) -
        GradientSimilarity.cosine(a.map(_ * s), b)) < 1e-9
    }, n = 30)
  }

  test("cosine stays within [-1, 1]") {
    val pairGen = for {
      n <- Gen.choose(1, 20)
      a <- Gen.listOfN(n, Gen.choose(-5.0, 5.0))
      b <- Gen.listOfN(n, Gen.choose(-5.0, 5.0))
    } yield (a.toArray, b.toArray)
    checkProp(Prop.forAll(pairGen) { case (a, b) =>
      val c = GradientSimilarity.cosine(a, b)
      c >= -1.0 - 1e-12 && c <= 1.0 + 1e-12
    }, n = 50)
  }

  test("zero vectors give similarity 0, mismatched sizes are rejected") {
    assert(GradientSimilarity.cosine(Array(0.0, 0.0), Array(1.0, 2.0)) == 0.0)
    assertThrows[IllegalArgumentException](
      GradientSimilarity.cosine(Array(1.0), Array(1.0, 2.0)))
  }
}
