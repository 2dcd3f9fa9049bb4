package repro.jobs

import org.apache.spark.sql.SparkSession

import repro.core.PcrEncoder
import repro.experiments.Fig5Throughput
import repro.imaging.SyntheticImages
import repro.train.Features

/** Reproduces Figure 16: token-bucket bandwidth sweep per scan and model.
  * Usage: `Fig16Bandwidth [sf]`.
  */
object Fig16Bandwidth {
  def main(args: Array[String]): Unit = {
    val sf = args.headOption.map(_.toDouble).getOrElse(0.1)
    val spark = SparkSession.builder.appName("pcr-fig16").getOrCreate()
    try {
      val spec = SyntheticImages.imagenet
      val dir = java.nio.file.Files.createTempDirectory("pcr-fig16").toString
      val manifests = PcrEncoder.encodeDataset(spark, spec, sf, dir)
      val meanFull = manifests.map(_.totalBytes).sum.toDouble /
        manifests.map(_.nImages.toLong).sum
      for (arch <- Seq(Features.resnetLite, Features.shufflenetLite)) {
        println(s"== ${arch.name} ==")
        println(repro.experiments.Fig16Bandwidth.render(repro.experiments.Fig16Bandwidth.run(manifests,
          spec.imagesPerRecord,
          Fig5Throughput.PaperNodes * arch.imagesPerSecPerNode, meanFull)))
      }
    } finally spark.stop()
  }
}
