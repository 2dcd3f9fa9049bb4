package repro.jpeg

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.{Gen, Prop}

import repro.PropSupport
import repro.imaging.{PlanarImage, Rng, SyntheticImages}

class CodecSpec extends AnyFunSuite with PropSupport {

  private def randomImage(seed: Long, w: Int = 32, h: Int = 32): PlanarImage = {
    val rng = new Rng(seed)
    PlanarImage(w, h,
      Array.fill(w * h)((rng.nextDouble() * 256).toInt.min(255)),
      Array.fill(w * h / 4)((rng.nextDouble() * 256).toInt.min(255)),
      Array.fill(w * h / 4)((rng.nextDouble() * 256).toInt.min(255)))
  }

  private def syntheticImage(id: Long): PlanarImage =
    SyntheticImages.generate(SyntheticImages.imagenet, id)

  // ---------------------------------------------------------------- exact paths

  test("sequential encode/decode round-trips the quantized image exactly") {
    // The codec is lossy only through quantization: re-encoding a decoded
    // image at quality 100 with all-ones tables must be near-lossless, and
    // decode(encode(x)) must equal the quantization-only reconstruction.
    for (seed <- 1L to 3L) {
      val img = randomImage(seed)
      val ci = Codec.toCoefficients(img, 90)
      val direct = Codec.fromCoefficients(ci, 90, Array.fill(3, 64)(0))
      val decoded = Codec.decodeSequential(Codec.encodeSequential(img, 90), 90, 32, 32)
      assert(decoded.y.sameElements(direct.y))
      assert(decoded.cb.sameElements(direct.cb))
      assert(decoded.cr.sameElements(direct.cr))
    }
  }

  test("full progressive decode is bit-identical to sequential decode") {
    // The paper (§3): "Reading all scan groups … decodes to identical bytes
    // as the conventional JPEG format."
    for (seed <- 1L to 3L; quality <- Seq(50, 75, 92, 100)) {
      val img = randomImage(seed)
      val scans = Codec.encodeProgressive(img, quality)
      val prog = Codec.decodeProgressive(scans, quality, img.width, img.height)
      val seq = Codec.decodeSequential(Codec.encodeSequential(img, quality), quality,
        img.width, img.height)
      assert(prog.y.sameElements(seq.y), s"luma mismatch q=$quality seed=$seed")
      assert(prog.cb.sameElements(seq.cb), s"cb mismatch q=$quality seed=$seed")
      assert(prog.cr.sameElements(seq.cr), s"cr mismatch q=$quality seed=$seed")
    }
  }

  test("decoded coefficients equal encoded coefficients at full fidelity") {
    checkProp(Prop.forAll(Gen.choose(0L, 10000L)) { seed =>
      val img = randomImage(seed, 16, 16)
      val ci = Codec.toCoefficients(img, 85)
      val scans = Codec.encodeScript(ci, ScanScript.progressive10)
      val (ci2, depth) = Codec.decodeScans(scans, ScanScript.progressive10, 16, 16)
      depth.forall(_.forall(_ == 0)) &&
        (0 until 3).forall { c =>
          ci.comps(c).indices.forall(b => ci.comps(c)(b).sameElements(ci2.comps(c)(b)))
        }
    }, n = 25)
  }

  // ----------------------------------------------------------- prefix behaviour

  test("every scan prefix decodes without error and improves or holds PSNR") {
    val img = syntheticImage(7)
    val scans = Codec.encodeProgressive(img, 92)
    val ref = Codec.decodeProgressive(scans, 92, img.width, img.height)
    var lastPsnr = 0.0
    for (g <- 1 to 10) {
      val dec = Codec.decodeProgressive(scans.take(g), 92, img.width, img.height)
      val p = dec.psnrY(ref)
      assert(p >= lastPsnr - 0.75, s"PSNR regressed at scan $g: $p vs $lastPsnr")
      lastPsnr = math.max(lastPsnr, p)
    }
    assert(lastPsnr.isInfinity, "scan 10 should reproduce the full-fidelity image")
  }

  test("scan 1 (DC only) reconstructs a blocky but unbiased approximation") {
    val img = syntheticImage(3)
    val scans = Codec.encodeProgressive(img, 92)
    val dc = Codec.decodeProgressive(scans.take(1), 92, img.width, img.height)
    val meanOrig = img.y.map(_.toDouble).sum / img.y.length
    val meanDc = dc.y.map(_.toDouble).sum / dc.y.length
    assert(math.abs(meanOrig - meanDc) < 8.0, s"mean drifted: $meanOrig vs $meanDc")
    assert(dc.psnrY(img) > 10.0)
  }

  test("later scans strictly add information on natural-ish images") {
    val img = syntheticImage(11)
    val scans = Codec.encodeProgressive(img, 92)
    val p1 = Codec.decodeProgressive(scans.take(1), 92, img.width, img.height).psnrY(img)
    val p5 = Codec.decodeProgressive(scans.take(5), 92, img.width, img.height).psnrY(img)
    val p10 = Codec.decodeProgressive(scans, 92, img.width, img.height).psnrY(img)
    assert(p1 < p5 && p5 < p10, s"psnr not increasing: $p1, $p5, $p10")
  }

  // ------------------------------------------------------------------ size laws

  test("progressive scan streams are non-empty and sizes are plausible") {
    val img = syntheticImage(5)
    val scans = Codec.encodeProgressive(img, 92)
    assert(scans.length == 10)
    scans.foreach(s => assert(s.nonEmpty))
    val total = scans.map(_.length).sum
    assert(total > 200 && total < 64 * 64 * 3, s"implausible total $total")
  }

  test("higher quality yields larger progressive payloads") {
    val img = syntheticImage(13)
    val sizes = Seq(50, 75, 95).map(q => Codec.encodeProgressive(img, q).map(_.length).sum)
    assert(sizes(0) < sizes(1) && sizes(1) < sizes(2), s"sizes not monotone: $sizes")
  }

  test("progressive total size is within 2× of the sequential payload") {
    // Real progressive JPEG is usually slightly smaller; our fixed-length
    // symbol coder is close enough that the layouts stay comparable.
    for (seed <- 1L to 3L) {
      val img = syntheticImage(seed)
      val prog = Codec.encodeProgressive(img, 92).map(_.length).sum
      val seq = Codec.encodeSequential(img, 92).length
      val ratio = prog.toDouble / seq
      assert(ratio > 0.5 && ratio < 2.0, s"ratio $ratio out of bounds")
    }
  }

  test("frame/unframe round-trips") {
    val chunksGen = Gen.choose(0, 64).flatMap(n =>
      Gen.listOfN(n, Gen.listOf(Gen.choose(-128, 127).map(_.toByte))))
    checkProp(Prop.forAll(chunksGen) { chunks =>
      val arrays = chunks.map(_.toArray)
      val back = Codec.unframe(Codec.frame(arrays))
      back.length == arrays.length &&
        back.zip(arrays).forall { case (a, b) => a.sameElements(b) }
    }, n = 50)
  }

  test("flat images compress to almost nothing") {
    val flat = PlanarImage.flat(32, 32)
    val scans = Codec.encodeProgressive(flat, 92)
    assert(scans.map(_.length).sum < 200)
    val dec = Codec.decodeProgressive(scans, 92, 32, 32)
    assert(dec.y.forall(_ == 128))
  }

  test("decode rejects more scan payloads than the script has") {
    val img = randomImage(1, 16, 16)
    val scans = Codec.encodeProgressive(img, 80)
    assertThrows[IllegalArgumentException](
      Codec.decodeProgressive(scans :+ Array[Byte](0), 80, 16, 16))
  }
}
