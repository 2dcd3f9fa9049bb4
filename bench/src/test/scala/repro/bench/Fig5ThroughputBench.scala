package repro.bench

import repro.SparkSpec
import repro.experiments.Fig5Throughput
import repro.imaging.SyntheticImages
import repro.train.Features

/** Figure 5 / 25 and §6.2 — cluster training rate per scan group.
  *
  * Paper (Fig 5, ResNet-18, 10 nodes, 400+ MiB/s): scan 1 ≈ scan 2 ≈ the
  * ~4.2k img/s compute limit, scan 5 ≈ 2× TFRecord, scan 10 ≈ TFRecord;
  * File-per-Image is ~25× slower than records (§6.2). Predictions from the
  * queueing model track the measured rates.
  */
class Fig5ThroughputBench extends SparkSpec {

  private val spec = SyntheticImages.imagenet

  private lazy val resnetRows = {
    val (_, manifests) = BenchData.pcrDataset(spec)
    val (_, tfr) = BenchData.tfrDataset(spec)
    Fig5Throughput.run(spec, manifests, tfr, Features.resnetLite.imagesPerSecPerNode)
  }
  private lazy val shuffleRows = {
    val (_, manifests) = BenchData.pcrDataset(spec)
    val (_, tfr) = BenchData.tfrDataset(spec)
    Fig5Throughput.run(spec, manifests, tfr, Features.shufflenetLite.imagesPerSecPerNode)
  }

  private def row(rows: Seq[repro.experiments.RateRow], name: String) =
    rows.find(_.config == name).get

  test("Fig 5: report ResNet-18 cluster rates") {
    BenchData.report("Fig 5 (ImageNet/ResNet-18 cluster rates)")(
      Fig5Throughput.render(resnetRows))
  }

  test("Fig 25: report ShuffleNet cluster rates") {
    BenchData.report("Fig 25 (ImageNet/ShuffleNet cluster rates)")(
      Fig5Throughput.render(shuffleRows))
  }

  test("scan 10 performs like TFRecord (same bytes, same rate)") {
    for (rows <- Seq(resnetRows, shuffleRows)) {
      val s10 = row(rows, "scan 10"); val tfr = row(rows, "TFRecord")
      val ratio = s10.simulatedImagesPerSec / tfr.simulatedImagesPerSec
      assert(ratio > 0.85 && ratio < 1.15, s"scan10/TFRecord rate ratio $ratio")
    }
  }

  test("IO-bound speedups track the size ratio (Theorem 4.1)") {
    val s5 = row(resnetRows, "scan 5"); val s10 = row(resnetRows, "scan 10")
    val speedup = s5.simulatedImagesPerSec / s10.simulatedImagesPerSec
    val sizeRatio = s10.meanBytesPerImage / s5.meanBytesPerImage
    val computeCap = 4500.0 / s10.simulatedImagesPerSec
    val expected = math.min(sizeRatio, computeCap)
    assert(math.abs(speedup - expected) / expected < 0.25,
      s"speedup $speedup vs expected $expected (size ratio $sizeRatio)")
    assert(speedup > 1.15, s"scan 5 shows no speedup: $speedup")
  }

  test("low scans reach the compute limit (paper: ~4.2k img/s for ResNet)") {
    val s1 = row(resnetRows, "scan 1")
    assert(s1.simulatedImagesPerSec > 0.9 * 10 * Features.resnetLite.imagesPerSecPerNode,
      s"scan 1 rate ${s1.simulatedImagesPerSec}")
  }

  test("the queueing-model prediction tracks the simulation") {
    for (rows <- Seq(resnetRows, shuffleRows); r <- rows if r.config.startsWith("scan")) {
      val err = math.abs(r.simulatedImagesPerSec - r.predictedImagesPerSec) /
        r.predictedImagesPerSec
      assert(err < 0.15, s"${r.config}: sim ${r.simulatedImagesPerSec} vs " +
        s"predicted ${r.predictedImagesPerSec}")
    }
  }

  test("File-per-Image is an order of magnitude slower than records (§6.2)") {
    val fpi = row(resnetRows, "File-per-Image")
    val tfr = row(resnetRows, "TFRecord")
    val slowdown = tfr.simulatedImagesPerSec / fpi.simulatedImagesPerSec
    assert(slowdown > 10, s"FPI slowdown only $slowdown (paper: ~25×)")
  }

  test("Fig 9: doubling the workers exposes the 2× scan-5 speedup") {
    // The paper's "heavy" 20-worker run: doubled compute forces the IO
    // bottleneck, and scan 5 finishes epochs 2× faster than scan 10 /
    // TFRecord (which finish simultaneously).
    val (_, manifests) = BenchData.pcrDataset(spec)
    val (_, tfr) = BenchData.tfrDataset(spec)
    val rows20 = Fig5Throughput.run(spec, manifests, tfr,
      Features.resnetLite.imagesPerSecPerNode, nNodes = 20)
    BenchData.report("Fig 9 (20-worker heavy run, ResNet-18)")(
      Fig5Throughput.render(rows20))
    val s1 = rows20.find(_.config == "scan 1").get.simulatedImagesPerSec
    val s5 = rows20.find(_.config == "scan 5").get.simulatedImagesPerSec
    val s10 = rows20.find(_.config == "scan 10").get.simulatedImagesPerSec
    val tfrRate = rows20.find(_.config == "TFRecord").get.simulatedImagesPerSec
    // Scan 5's 1.9× byte ratio lands at ~1.6× here because the per-record
    // seek is not fully amortized at our scaled record sizes; scan 1/2
    // match the paper's 100 s vs 300 s epoch-latency ratio (~3×).
    assert(s5 / s10 > 1.5 && s5 / s10 < 2.4, s"heavy scan-5 speedup ${s5 / s10}")
    assert(s1 / s10 > 2.4 && s1 / s10 < 3.6, s"heavy scan-1 speedup ${s1 / s10}")
    assert(math.abs(s10 / tfrRate - 1.0) < 0.15, s"scan10/TFRecord ${s10 / tfrRate}")
  }

  test("ShuffleNet's faster compute yields larger low-scan speedups (§6.6)") {
    def speedup(rows: Seq[repro.experiments.RateRow]) =
      row(rows, "scan 1").simulatedImagesPerSec / row(rows, "scan 10").simulatedImagesPerSec
    assert(speedup(shuffleRows) >= speedup(resnetRows) * 0.99,
      s"shufflenet ${speedup(shuffleRows)} vs resnet ${speedup(resnetRows)}")
  }
}
