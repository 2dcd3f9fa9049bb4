package repro.imaging

import org.scalatest.funsuite.AnyFunSuite

class PlanarImageSpec extends AnyFunSuite {

  test("dimension invariants are enforced") {
    assertThrows[IllegalArgumentException](
      PlanarImage(17, 16, new Array[Int](17 * 16), new Array[Int](68), new Array[Int](68)))
    assertThrows[IllegalArgumentException](
      PlanarImage(16, 16, new Array[Int](10), new Array[Int](64), new Array[Int](64)))
  }

  test("flat image is uniform") {
    val img = PlanarImage.flat(16, 16, 42)
    assert(img.y.forall(_ == 42))
    assert(img.cb.forall(_ == 128) && img.cr.forall(_ == 128))
  }

  test("clamp255 bounds and rounds") {
    assert(PlanarImage.clamp255(-3.2) == 0)
    assert(PlanarImage.clamp255(300.0) == 255)
    assert(PlanarImage.clamp255(127.4) == 127)
    assert(PlanarImage.clamp255(127.6) == 128)
  }

  test("mse/psnr of identical images") {
    val img = PlanarImage.flat(16, 16, 100)
    assert(img.mseY(img) == 0.0)
    assert(img.psnrY(img).isInfinity)
  }

  test("mse of a known perturbation") {
    val a = PlanarImage.flat(16, 16, 100)
    val y = a.y.clone(); y(0) = 110
    val b = a.copy(y = y)
    assert(math.abs(a.mseY(b) - 100.0 / 256) < 1e-12)
  }

  test("psnr decreases with larger error") {
    val a = PlanarImage.flat(16, 16, 100)
    val b = a.copy(y = a.y.map(_ + 5))
    val c = a.copy(y = a.y.map(_ + 20))
    assert(a.psnrY(b) > a.psnrY(c))
  }

  test("downsample averages blocks") {
    val y = Array.tabulate(16 * 16)(i => if ((i % 16) < 8) 0 else 100)
    val img = PlanarImage(16, 16, y, Array.fill(64)(128), Array.fill(64)(128))
    val d = img.downsampleY(8)
    assert(d.length == 4)
    assert(d(0) == 0.0 && d(1) == 100.0 && d(2) == 0.0 && d(3) == 100.0)
  }

  test("downsample by 1 is the identity") {
    val img = PlanarImage.flat(16, 16, 77)
    assert(img.downsampleY(1).forall(_ == 77.0))
  }

  test("downsample with a non-dividing factor is rejected") {
    val img = PlanarImage.flat(16, 16)
    assertThrows[IllegalArgumentException](img.downsampleY(5))
  }
}
