package repro.imaging

import org.scalatest.funsuite.AnyFunSuite

class MssimSpec extends AnyFunSuite {

  private def noisy(img: PlanarImage, sigma: Double, seed: Long): PlanarImage = {
    val rng = new Rng(seed)
    img.copy(y = img.y.map(v => PlanarImage.clamp255(v + sigma * rng.nextGaussian())))
  }

  test("self-similarity is 1") {
    val img = SyntheticImages.generate(SyntheticImages.imagenet, 1)
    assert(math.abs(Mssim.msssim(img, img) - 1.0) < 1e-9)
  }

  test("similarity decreases with noise level") {
    val img = SyntheticImages.generate(SyntheticImages.imagenet, 2)
    val s5 = Mssim.msssim(img, noisy(img, 5, 1))
    val s20 = Mssim.msssim(img, noisy(img, 20, 1))
    val s60 = Mssim.msssim(img, noisy(img, 60, 1))
    assert(s5 > s20 && s20 > s60, s"not monotone: $s5, $s20, $s60")
    assert(s5 > 0.8)
  }

  test("values stay in (0, 1]") {
    val img = SyntheticImages.generate(SyntheticImages.cars, 3)
    val other = SyntheticImages.generate(SyntheticImages.cars, 4)
    val v = Mssim.msssim(img, other)
    assert(v > 0.0 && v <= 1.0)
  }

  test("single-scale ssim of identical planes is 1") {
    val p = Array.tabulate(256.0.toInt)(i => (i % 16).toDouble * 10)
    assert(math.abs(Mssim.ssim(p, p, 16, 16) - 1.0) < 1e-9)
  }

  test("ssim penalizes a constant shift less than structural destruction") {
    val img = SyntheticImages.generate(SyntheticImages.imagenet, 5)
    val shifted = img.copy(y = img.y.map(v => math.min(255, v + 10)))
    val scrambled = {
      val rng = new Rng(9)
      img.copy(y = img.y.map(_ => (rng.nextDouble() * 256).toInt.min(255)))
    }
    assert(Mssim.msssim(img, shifted) > Mssim.msssim(img, scrambled))
  }

  test("size mismatch is rejected") {
    val a = PlanarImage.flat(16, 16)
    val b = PlanarImage.flat(32, 32)
    assertThrows[IllegalArgumentException](Mssim.msssim(a, b))
  }

  test("mssim tracks codec scan fidelity (paper Fig 23 shape)") {
    val img = SyntheticImages.generate(SyntheticImages.imagenet, 6)
    val scans = repro.jpeg.Codec.encodeProgressive(img, 92)
    val ref = repro.jpeg.Codec.decodeProgressive(scans, 92, img.width, img.height)
    val m = Seq(1, 2, 5, 10).map { g =>
      val dec = repro.jpeg.Codec.decodeProgressive(scans.take(g), 92, img.width, img.height)
      Mssim.msssim(ref, dec)
    }
    assert(m(0) < m(2) && m(2) <= m(3), s"not increasing: $m")
    assert(math.abs(m(3) - 1.0) < 1e-9, "scan 10 must be exact")
  }
}
