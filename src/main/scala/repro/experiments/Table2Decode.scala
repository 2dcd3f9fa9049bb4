package repro.experiments

import repro.imaging.{DatasetSpec, SyntheticImages}
import repro.jpeg.Codec

/** Table 2: single-core decode rates (images/s) at each scan prefix and for
  * the baseline sequential encoding.
  *
  * This is a genuine wall-clock microbenchmark of our codec: progressive
  * decoding pays one entropy pass per scan read, so decoding all 10 scans is
  * slower than one sequential pass — the paper's "over 2× more expensive"
  * observation — while shallow prefixes are comparable or faster.
  */
final case class DecodeRates(
    dataset: String,
    nImages: Int,
    imagesPerSecByScan: Map[Int, Double],
    baselineImagesPerSec: Double)

object Table2Decode {
  val ReportedScans: Seq[Int] = Seq(1, 2, 5, 10)

  /** Best-of-`trials` wall time: the minimum over repeated runs filters
    * out GC pauses and JIT warmup jitter.
    */
  private def timeSec(trials: Int)(work: => Unit): Double =
    (0 until trials).map { _ =>
      val t0 = System.nanoTime()
      work
      (System.nanoTime() - t0) / 1e9
    }.min

  def measure(spec: DatasetSpec, nImages: Int, seed: Long = 0L, trials: Int = 5): DecodeRates = {
    val images = (0 until nImages).map(i => SyntheticImages.generate(spec, i.toLong, seed))
    val progressive = images.map(Codec.encodeProgressive(_, spec.quality))
    val sequential = images.map(Codec.encodeSequential(_, spec.quality))

    def decodeAll(g: Int): Unit =
      progressive.foreach(s =>
        Codec.decodeProgressive(s.take(g), spec.quality, spec.width, spec.height))
    def decodeBaseline(): Unit =
      sequential.foreach(b =>
        Codec.decodeSequential(b, spec.quality, spec.width, spec.height))

    // Warm the JIT on every measured configuration before timing any of
    // them — mid-measurement compilation otherwise dominates the signal.
    (0 until 2).foreach { _ =>
      ReportedScans.foreach(decodeAll)
      decodeBaseline()
    }

    val rates = ReportedScans.map(g => g -> nImages / timeSec(trials)(decodeAll(g))).toMap
    val base = nImages / timeSec(trials)(decodeBaseline())
    DecodeRates(spec.name, nImages, rates, base)
  }

  def render(rows: Seq[DecodeRates]): String = {
    val header = Seq(
      "| Dataset   | Scan 1 | Scan 2 | Scan 5 | Scan 10 | Baseline |",
      "|-----------|--------|--------|--------|---------|----------|")
    val body = rows.map { r =>
      f"| ${r.dataset}%-9s | ${r.imagesPerSecByScan(1)}%6.0f | ${r.imagesPerSecByScan(2)}%6.0f " +
        f"| ${r.imagesPerSecByScan(5)}%6.0f | ${r.imagesPerSecByScan(10)}%7.0f " +
        f"| ${r.baselineImagesPerSec}%8.0f |"
    }
    (header ++ body).mkString("\n")
  }
}
