package repro.jobs

import org.apache.spark.sql.SparkSession

import repro.imaging.SyntheticImages

/** Reproduces Figure 22: PCR encode cost vs. static re-encodes at four
  * qualities. Usage: `Fig22Encoding [sf]`.
  */
object Fig22Encoding {
  def main(args: Array[String]): Unit = {
    val sf = args.headOption.map(_.toDouble).getOrElse(0.1)
    val spark = SparkSession.builder.appName("pcr-fig22").getOrCreate()
    try {
      val base = java.nio.file.Files.createTempDirectory("pcr-fig22").toString
      println(repro.experiments.Fig22Encoding.render(
        SyntheticImages.all.map(repro.experiments.Fig22Encoding.measure(spark, _, sf, base))))
    } finally spark.stop()
  }
}
