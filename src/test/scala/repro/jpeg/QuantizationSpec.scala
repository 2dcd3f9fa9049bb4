package repro.jpeg

import org.scalatest.funsuite.AnyFunSuite

class QuantizationSpec extends AnyFunSuite {

  test("quality 50 reproduces the base tables") {
    assert(Quantization.luma(50).sameElements(Quantization.baseLuma))
    assert(Quantization.chroma(50).sameElements(Quantization.baseChroma))
  }

  test("quality 100 is all ones") {
    assert(Quantization.luma(100).forall(_ == 1))
    assert(Quantization.chroma(100).forall(_ == 1))
  }

  test("divisors never leave [1, 255]") {
    for (q <- 1 to 100) {
      assert(Quantization.luma(q).forall(v => v >= 1 && v <= 255), s"quality $q")
      assert(Quantization.chroma(q).forall(v => v >= 1 && v <= 255), s"quality $q")
    }
  }

  test("higher quality never increases a divisor") {
    for (q <- 1 until 100) {
      val lo = Quantization.luma(q); val hi = Quantization.luma(q + 1)
      lo.indices.foreach(i => assert(hi(i) <= lo(i), s"quality $q idx $i"))
    }
  }

  test("chroma divisors dominate luma at matching positions for low bands") {
    // The standard tables quantize chroma harder than luma almost everywhere.
    val l = Quantization.luma(75); val c = Quantization.chroma(75)
    val dominated = l.indices.count(i => c(i) >= l(i))
    assert(dominated > 48, s"only $dominated/64 positions dominated")
  }

  test("quality outside [1,100] is rejected") {
    assertThrows[IllegalArgumentException](Quantization.luma(0))
    assertThrows[IllegalArgumentException](Quantization.luma(101))
  }

  test("the base luminance DC divisor matches Annex K") {
    assert(Quantization.baseLuma(0) == 16)
    assert(Quantization.baseChroma(0) == 17)
  }
}
