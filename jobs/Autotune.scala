package repro.jobs

import org.apache.spark.sql.SparkSession

import repro.core.PcrEncoder
import repro.experiments.AutotuneExp
import repro.imaging.SyntheticImages
import repro.train.Features

/** Reproduces Figures 6 and 14: the gradient-similarity trace and the
  * autotuned run vs. static scan schedules. Usage: `Autotune [sf]`.
  */
object Autotune {
  def main(args: Array[String]): Unit = {
    val sf = args.headOption.map(_.toDouble).getOrElse(0.1)
    val spark = SparkSession.builder.appName("pcr-autotune").getOrCreate()
    try {
      val spec = SyntheticImages.ham10000
      val dir = java.nio.file.Files.createTempDirectory("pcr-autotune").toString
      val manifests = PcrEncoder.encodeDataset(spark, spec, sf, dir)
      println("== gradient similarity (Fig 6) ==")
      println(AutotuneExp.renderTrace(AutotuneExp.similarityTrace(
        spark, spec, dir, Features.shufflenetLite, lr = 1.0)))
      println("== autotuned vs static (Fig 14) ==")
      println(AutotuneExp.renderRuns(AutotuneExp.compare(
        spark, spec, dir, manifests, Features.shufflenetLite, lr = 1.0)))
    } finally spark.stop()
  }
}
