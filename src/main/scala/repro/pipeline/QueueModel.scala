package repro.pipeline

/** Closed-form throughput model of the training pipeline (§4.1 and
  * Appendix A.2): a closed-system data loader feeding an open-system
  * compute unit. All rates are images per second; sizes are bytes.
  */
object QueueModel {

  /** Lemma A.2: image throughput of a loader with bandwidth `w` over data
    * of mean image size `meanImageBytes`.
    */
  def ioRate(bandwidthBytesPerSec: Double, meanImageBytes: Double): Double = {
    require(meanImageBytes > 0, "mean image size must be positive")
    bandwidthBytesPerSec / meanImageBytes
  }

  /** Lemma A.1 with the Θ(1) setup cost kept: image throughput of a loader
    * reading whole records of `meanRecordBytes` that pay `setupSeconds`
    * (seek/request latency) per record. The paper drops the setup term for
    * its 10 MiB+ records; at laptop-scale record sizes it matters.
    */
  def ioRateWithSetup(
      bandwidthBytesPerSec: Double,
      meanRecordBytes: Double,
      imagesPerRecord: Int,
      setupSeconds: Double): Double = {
    require(meanRecordBytes > 0 && imagesPerRecord > 0, "record shape must be positive")
    imagesPerRecord / (setupSeconds + meanRecordBytes / bandwidthBytesPerSec)
  }

  /** Lemma A.4: the pipeline runs at the slower of its two subsystems. */
  def pipelineRate(computeRate: Double, ioRateImgs: Double): Double =
    math.min(computeRate, ioRateImgs)

  /** Theorem 4.1: maximum speedup from switching datasets is the ratio of
    * mean sample sizes (only realized when the pipeline is data bound).
    */
  def sMax(meanBytesFrom: Double, meanBytesTo: Double): Double = {
    require(meanBytesFrom > 0 && meanBytesTo > 0, "sizes must be positive")
    meanBytesFrom / meanBytesTo
  }

  /** Predicted cluster training rate (Figure 5): `nNodes` identical workers
    * behind shared aggregate storage bandwidth.
    */
  def clusterRate(
      nNodes: Int,
      perNodeComputeRate: Double,
      aggregateBandwidth: Double,
      meanImageBytes: Double): Double =
    pipelineRate(nNodes * perNodeComputeRate, ioRate(aggregateBandwidth, meanImageBytes))

  /** Seconds per epoch at a given pipeline rate. */
  def epochSeconds(nImages: Long, rate: Double): Double = {
    require(rate > 0, "rate must be positive")
    nImages.toDouble / rate
  }

  /** Fraction of wall time spent stalled on data (Amdahl's view, §4.1). */
  def stallFraction(computeRate: Double, ioRateImgs: Double): Double =
    if (ioRateImgs >= computeRate) 0.0 else 1.0 - ioRateImgs / computeRate
}
