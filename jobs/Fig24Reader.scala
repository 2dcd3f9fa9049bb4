package repro.jobs

import org.apache.spark.sql.SparkSession

import repro.core.PcrEncoder
import repro.imaging.SyntheticImages

/** Reproduces Figure 24: raw reader throughput per scan group (no decode).
  * Usage: `Fig24Reader [sf]`.
  */
object Fig24Reader {
  def main(args: Array[String]): Unit = {
    val sf = args.headOption.map(_.toDouble).getOrElse(0.1)
    val spark = SparkSession.builder.appName("pcr-fig24").getOrCreate()
    try {
      val spec = SyntheticImages.imagenet
      val dir = java.nio.file.Files.createTempDirectory("pcr-fig24").toString
      PcrEncoder.encodeDataset(spark, spec, sf, dir)
      println(repro.experiments.Fig24Reader.render(repro.experiments.Fig24Reader.run(dir, reps = 10)))
    } finally spark.stop()
  }
}
