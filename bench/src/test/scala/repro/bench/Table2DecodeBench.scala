package repro.bench

import repro.SparkSpec
import repro.experiments.Table2Decode
import repro.imaging.SyntheticImages

/** Table 2 — single-core decode rate (images/s) per scan vs. baseline.
  *
  * Paper values (images/s):
  *   ImageNet  433 412 340 146 | 419
  *   HAM10000  465 438 275  96 | 240
  *   Cars      266 240 225 127 | 268
  *   CelebAHQ  239 213 195 129 | 286
  *
  * Absolute rates differ (our images are smaller, our decoder is JVM
  * Scala), but the structure must hold: shallow prefixes decode at least
  * as fast as the sequential baseline, and the full 10-scan progressive
  * decode is substantially slower than baseline.
  */
class Table2DecodeBench extends SparkSpec {

  private lazy val rates = {
    // Throwaway run: fully compile every decode path before the first
    // dataset is measured, otherwise the first row absorbs JIT warmup.
    Table2Decode.measure(SyntheticImages.imagenet, 60)
    SyntheticImages.all.map { spec =>
      val n = if (spec.width >= 128) 100 else 250
      Table2Decode.measure(spec, n)
    }
  }

  test("Table 2: measure and report single-core decode rates") {
    BenchData.report("Table 2 (single-core decode rates, images/s)")(
      Table2Decode.render(rates))
  }

  test("decode rate decreases with the number of scans read") {
    for (r <- rates) {
      assert(r.imagesPerSecByScan(1) > 0.98 * r.imagesPerSecByScan(5), r.dataset)
      assert(r.imagesPerSecByScan(1) > 1.02 * r.imagesPerSecByScan(10),
        s"${r.dataset}: scan1 ${r.imagesPerSecByScan(1)} vs scan10 ${r.imagesPerSecByScan(10)}")
      assert(r.imagesPerSecByScan(5) > 0.95 * r.imagesPerSecByScan(10), r.dataset)
    }
  }

  test("full progressive decode pays a penalty where entropy work dominates") {
    // Deviation from the paper noted in EXPERIMENTS.md: our fixed-length
    // symbol coder is far cheaper than Huffman, so the full-progressive
    // penalty (paper: >2×) shrinks. It must still be visible on HAM10000
    // (largest images, quality 100 → entropy-dominated), and full
    // progressive must never be meaningfully *faster* than baseline.
    for (r <- rates) {
      val slowdown = r.baselineImagesPerSec / r.imagesPerSecByScan(10)
      assert(slowdown > 0.85, f"${r.dataset}: progressive implausibly faster ($slowdown%.2f)")
    }
    val ham = rates.find(_.dataset == "ham10000").get
    val hamGain = ham.imagesPerSecByScan(1) / ham.imagesPerSecByScan(10)
    assert(hamGain > 1.5, f"HAM scan-1/scan-10 decode gain only $hamGain%.2f")
  }

  test("shallow prefixes are comparable to or faster than baseline") {
    for (r <- rates)
      assert(r.imagesPerSecByScan(1) > 0.8 * r.baselineImagesPerSec,
        s"${r.dataset}: scan1 ${r.imagesPerSecByScan(1)} vs baseline ${r.baselineImagesPerSec}")
  }

  test("rates are in a plausible absolute range for the JVM codec") {
    for (r <- rates; (g, v) <- r.imagesPerSecByScan)
      assert(v > 10 && v < 1e6, s"${r.dataset} scan $g: $v img/s")
  }
}
