package repro.jobs

import org.apache.spark.sql.SparkSession

import repro.core.{BaselineFormats, PcrEncoder}
import repro.imaging.SyntheticImages
import repro.train.Features

/** Reproduces Figure 5 / 25: cluster training rates per scan group vs.
  * TFRecord and File-per-Image. Usage: `Fig5Throughput [sf]`.
  */
object Fig5Throughput {
  def main(args: Array[String]): Unit = {
    val sf = args.headOption.map(_.toDouble).getOrElse(0.1)
    val spark = SparkSession.builder.appName("pcr-fig5").getOrCreate()
    try {
      val spec = SyntheticImages.imagenet
      val base = java.nio.file.Files.createTempDirectory("pcr-fig5").toString
      val manifests = PcrEncoder.encodeDataset(spark, spec, sf, s"$base/pcr")
      val tfr = BaselineFormats.writeTfRecordLike(spark, spec, sf, s"$base/tfr")
      for (arch <- Seq(Features.resnetLite, Features.shufflenetLite)) {
        println(s"== ${arch.name} ==")
        println(repro.experiments.Fig5Throughput.render(
          repro.experiments.Fig5Throughput.run(spec, manifests, tfr,
            arch.imagesPerSecPerNode)))
      }
    } finally spark.stop()
  }
}
