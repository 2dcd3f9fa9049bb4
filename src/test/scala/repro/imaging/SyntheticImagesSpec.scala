package repro.imaging

import org.scalatest.funsuite.AnyFunSuite

class SyntheticImagesSpec extends AnyFunSuite {

  test("all four paper datasets are registered") {
    assert(SyntheticImages.all.map(_.name).toSet ==
      Set("imagenet", "ham10000", "cars", "celebahq"))
    assert(SyntheticImages.byName("imagenet") eq SyntheticImages.imagenet)
    assertThrows[IllegalArgumentException](SyntheticImages.byName("mnist"))
  }

  test("dataset parameters mirror the paper's Table 3 structure") {
    assert(SyntheticImages.imagenet.numClasses == 10)  // 1000 in the paper, scaled
    assert(SyntheticImages.ham10000.numClasses == 7)
    assert(SyntheticImages.cars.numClasses == 32)      // 196 in the paper, scaled
    assert(SyntheticImages.celebahq.numClasses == 2)
    assert(SyntheticImages.ham10000.quality == 100)
    assert(SyntheticImages.celebahq.quality == 75)
    // HAM10000 has the largest images (paper: 250 kB vs 110 kB mean).
    assert(SyntheticImages.ham10000.width > SyntheticImages.imagenet.width)
  }

  test("generation is deterministic in (spec, id, seed)") {
    val a = SyntheticImages.generate(SyntheticImages.imagenet, 42)
    val b = SyntheticImages.generate(SyntheticImages.imagenet, 42)
    assert(a.y.sameElements(b.y) && a.cb.sameElements(b.cb) && a.cr.sameElements(b.cr))
  }

  test("different ids give different images") {
    val a = SyntheticImages.generate(SyntheticImages.imagenet, 1)
    val b = SyntheticImages.generate(SyntheticImages.imagenet, 2)
    assert(!a.y.sameElements(b.y))
  }

  test("different seeds give different images") {
    val a = SyntheticImages.generate(SyntheticImages.cars, 1, seed = 0)
    val b = SyntheticImages.generate(SyntheticImages.cars, 1, seed = 1)
    assert(!a.y.sameElements(b.y))
  }

  test("images have the spec's dimensions and valid pixel range") {
    for (spec <- SyntheticImages.all) {
      val img = SyntheticImages.generate(spec, 0)
      assert(img.width == spec.width && img.height == spec.height)
      assert(img.y.forall(v => v >= 0 && v <= 255))
      assert(img.cb.forall(v => v >= 0 && v <= 255))
    }
  }

  test("labels are exactly class-balanced") {
    val spec = SyntheticImages.imagenet
    val labels = (0L until 100L).map(SyntheticImages.label(spec, _))
    assert(labels.groupBy(identity).values.map(_.size).toSet == Set(10))
  }

  test("images of the same class share structure beyond chance") {
    // Class templates are additive: same-class image pairs must correlate
    // more than different-class pairs on average.
    val spec = SyntheticImages.celebahq
    def corr(a: PlanarImage, b: PlanarImage): Double = {
      val xa = a.y.map(_.toDouble); val xb = b.y.map(_.toDouble)
      val ma = xa.sum / xa.length; val mb = xb.sum / xb.length
      val num = xa.zip(xb).map { case (u, v) => (u - ma) * (v - mb) }.sum
      val da = math.sqrt(xa.map(u => (u - ma) * (u - ma)).sum)
      val db = math.sqrt(xb.map(v => (v - mb) * (v - mb)).sum)
      num / (da * db)
    }
    // ids 0,2,4… are class 0; 1,3,5… class 1.
    val same = corr(SyntheticImages.generate(spec, 0), SyntheticImages.generate(spec, 2))
    val diff = corr(SyntheticImages.generate(spec, 0), SyntheticImages.generate(spec, 1))
    assert(same > diff, s"same-class corr $same <= cross-class corr $diff")
  }

  test("cars hierarchy: 32 fine classes, 4 makes, binary task") {
    val spec = SyntheticImages.cars
    assert(spec.nMakes == 4)
    assert((0 until 32).map(SyntheticImages.makeLabel(spec, _)).distinct == Seq(0, 1, 2, 3))
    assert(SyntheticImages.isMakeZeroLabel(spec, 3) == 0)
    assert(SyntheticImages.isMakeZeroLabel(spec, 8) == 1)
    assertThrows[IllegalArgumentException](
      SyntheticImages.makeLabel(SyntheticImages.imagenet, 0))
  }

  test("numImages scales with sf and never hits zero") {
    val spec = SyntheticImages.imagenet
    assert(spec.numImages(1.0) == 12800)
    assert(spec.numImages(0.01) == 128)
    assert(spec.numImages(1e-9) == 1)
  }
}
