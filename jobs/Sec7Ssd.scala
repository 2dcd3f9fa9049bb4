package repro.jobs

import org.apache.spark.sql.SparkSession

import repro.core.{BaselineFormats, PcrEncoder}
import repro.imaging.SyntheticImages

/** Reproduces §7's single-node SSD generalization numbers.
  * Usage: `Sec7Ssd [sf]`.
  */
object Sec7Ssd {
  def main(args: Array[String]): Unit = {
    val sf = args.headOption.map(_.toDouble).getOrElse(0.1)
    val spark = SparkSession.builder.appName("pcr-sec7").getOrCreate()
    try {
      val spec = SyntheticImages.imagenet
      val base = java.nio.file.Files.createTempDirectory("pcr-sec7").toString
      val manifests = PcrEncoder.encodeDataset(spark, spec, sf, s"$base/pcr")
      val tfr = BaselineFormats.writeTfRecordLike(spark, spec, sf, s"$base/tfr")
      println(repro.experiments.Sec7Ssd.render(
        repro.experiments.Sec7Ssd.run(manifests, tfr.map(_._2), spec.imagesPerRecord)))
    } finally spark.stop()
  }
}
