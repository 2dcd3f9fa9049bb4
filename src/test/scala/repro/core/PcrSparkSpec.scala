package repro.core

import java.nio.file.Files

import repro.SparkSpec
import repro.imaging.SyntheticImages
import repro.jpeg.Codec

/** End-to-end tests of the Spark encoder job + decoder over real files. */
class PcrSparkSpec extends SparkSpec {

  private lazy val dir = Files.createTempDirectory("pcr-test").toString
  private val spec = SyntheticImages.imagenet
  private val sf = 0.02 // 256 images → 2 records of 128
  private lazy val manifests = PcrEncoder.encodeDataset(spark, spec, sf, dir)

  test("encoder writes one record per imagesPerRecord group") {
    assert(manifests.length == 2)
    assert(manifests.map(_.nImages).sum == spec.numImages(sf))
    assert(PcrEncoder.listRecords(dir).size == 2)
  }

  test("manifest offsets match on-disk headers") {
    for (m <- manifests) {
      val h = PcrDecoder.readHeader(m.path)
      assert(h.groupEndOffsets.toSeq == m.groupEndOffsets)
      assert(h.totalLength == m.totalBytes)
      assert(Files.size(java.nio.file.Paths.get(m.path)) == m.totalBytes)
    }
  }

  test("prefix bytes are strictly increasing in the scan group") {
    val m = manifests.head
    val sizes = (1 to 10).map(m.prefixBytes)
    sizes.sliding(2).foreach { case Seq(a, b) => assert(a < b) }
    assert(sizes.last == m.totalBytes)
  }

  test("full-fidelity PCR decode equals a direct codec round-trip") {
    val decoded = PcrDecoder.readRecord(manifests.head.path, 10)
    assert(decoded.length == 128)
    for (d <- decoded.take(4)) {
      val img = SyntheticImages.generate(spec, d.id)
      val scans = Codec.encodeProgressive(img, spec.quality)
      val direct = Codec.decodeProgressive(scans, spec.quality, spec.width, spec.height)
      assert(d.image.y.sameElements(direct.y), s"image ${d.id}")
      assert(d.image.cb.sameElements(direct.cb))
      assert(d.label == SyntheticImages.label(spec, d.id))
    }
  }

  test("partial-fidelity PCR decode equals a direct prefix decode") {
    for (g <- Seq(1, 2, 5)) {
      val decoded = PcrDecoder.readRecord(manifests.head.path, g)
      val d = decoded.head
      val img = SyntheticImages.generate(spec, d.id)
      val scans = Codec.encodeProgressive(img, spec.quality)
      val direct = Codec.decodeProgressive(scans.take(g), spec.quality, spec.width, spec.height)
      assert(d.image.y.sameElements(direct.y), s"scan $g image ${d.id}")
      assert(d.scanGroup == g)
    }
  }

  test("bytesRead reflects the amortized prefix size") {
    val h = PcrDecoder.readHeader(manifests.head.path)
    for (g <- Seq(1, 5, 10)) {
      val d = PcrDecoder.readRecord(manifests.head.path, g).head
      assert(math.abs(d.bytesRead - h.prefixLength(g).toDouble / h.nImages) < 1e-9)
    }
  }

  test("lower scan groups decode to lower-fidelity images") {
    val full = PcrDecoder.readRecord(manifests.head.path, 10).head
    val low = PcrDecoder.readRecord(manifests.head.path, 1).head
    val mid = PcrDecoder.readRecord(manifests.head.path, 5).head
    val pLow = low.image.psnrY(full.image)
    val pMid = mid.image.psnrY(full.image)
    assert(pLow < pMid, s"psnr scan1=$pLow scan5=$pMid")
  }

  test("requested scan group is capped at the record's group count") {
    val d = PcrDecoder.readRecord(manifests.head.path, 99)
    assert(d.head.scanGroup == 10)
  }

  test("record ids partition the dataset without overlap") {
    val ids = manifests.flatMap(m => PcrDecoder.readHeader(m.path).ids)
    assert(ids.sorted == (0L until spec.numImages(sf)))
  }
}
