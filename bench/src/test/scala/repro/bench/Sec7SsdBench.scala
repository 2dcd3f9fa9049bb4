package repro.bench

import repro.SparkSpec
import repro.experiments.Sec7Ssd
import repro.imaging.SyntheticImages

/** §7 "Generalizing across hardware" — single SSD-backed node.
  *
  * Paper (ImageNet/ShuffleNet, P100 + 74 MB/s SSD): TFRecord 650 img/s;
  * PCR 680 (scan 10), 1540 (scan 5), 1700 (scan 2), 1750 (scan 1); scan 5
  * is over 2× the baseline; doubling CPU/GPU/SSD resources preserves the
  * relative advantage.
  */
class Sec7SsdBench extends SparkSpec {

  private val spec = SyntheticImages.imagenet

  private def rows(scale: Double) = {
    val (_, manifests) = BenchData.pcrDataset(spec)
    val (_, tfr) = BenchData.tfrDataset(spec)
    Sec7Ssd.run(manifests, tfr.map(_._2), spec.imagesPerRecord, scale)
  }

  private lazy val base = rows(1.0)
  private lazy val doubled = rows(2.0)

  private def rate(rs: Seq[repro.experiments.SsdRow], name: String) =
    rs.find(_.config == name).get.imagesPerSec

  test("§7: report single-node SSD rates") {
    BenchData.report("§7 (single node, SSD 74 MB/s analog, ShuffleNet)")(
      Sec7Ssd.render(base))
  }

  test("scan 10 performs like TFRecord on the SSD node") {
    val ratio = rate(base, "scan 10") / rate(base, "TFRecord")
    assert(ratio > 0.9 && ratio < 1.15, s"scan10/TFRecord $ratio (paper: 680/650)")
  }

  test("scan 5 is well over 1.5× the baseline (paper: >2×)") {
    val speedup = rate(base, "scan 5") / rate(base, "scan 10")
    assert(speedup > 1.5, s"scan-5 speedup only $speedup (paper: 1540/680 ≈ 2.3)")
  }

  test("scan 1 approaches the accelerator's compute limit") {
    assert(rate(base, "scan 1") > 0.9 * Sec7Ssd.PaperComputeRate,
      s"scan 1 at ${rate(base, "scan 1")}")
    // Paper ordering: 1750 > 1700 > 1540 > 680.
    assert(rate(base, "scan 1") >= rate(base, "scan 2"))
    assert(rate(base, "scan 2") > rate(base, "scan 5"))
    assert(rate(base, "scan 5") > rate(base, "scan 10"))
  }

  test("doubling CPU/GPU/SSD preserves the relative advantages (§7)") {
    for (cfg <- Seq("scan 1", "scan 5", "scan 10", "TFRecord")) {
      val gain = rate(doubled, cfg) / rate(base, cfg)
      assert(math.abs(gain - 2.0) < 0.1, s"$cfg: resource doubling gave $gain×")
    }
    val relBase = rate(base, "scan 5") / rate(base, "TFRecord")
    val relDoubled = rate(doubled, "scan 5") / rate(doubled, "TFRecord")
    assert(math.abs(relBase - relDoubled) / relBase < 0.05,
      s"relative advantage moved: $relBase vs $relDoubled")
  }
}
