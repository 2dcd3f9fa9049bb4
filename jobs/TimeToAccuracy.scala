package repro.jobs

import org.apache.spark.sql.SparkSession

import repro.core.PcrEncoder
import repro.experiments.TrainGrid
import repro.imaging.SyntheticImages
import repro.train.Features

/** Reproduces Figures 7/10/11: test accuracy and simulated time per scan
  * group for every dataset/model, plus the Cars task-coarsening variants.
  * Usage: `TimeToAccuracy [sf] [epochs]`.
  */
object TimeToAccuracy {
  def main(args: Array[String]): Unit = {
    val sf = args.headOption.map(_.toDouble).getOrElse(0.1)
    val epochs = args.lift(1).map(_.toInt).getOrElse(50)
    val spark = SparkSession.builder.appName("pcr-tta").getOrCreate()
    try {
      val base = java.nio.file.Files.createTempDirectory("pcr-tta").toString
      val encoded = SyntheticImages.all.map { spec =>
        val dir = s"$base/${spec.name}"
        spec.name -> ((dir, PcrEncoder.encodeDataset(spark, spec, sf, dir)))
      }.toMap

      val rows = for {
        spec <- SyntheticImages.all
        arch <- Seq(Features.resnetLite, Features.shufflenetLite)
      } yield {
        val (dir, manifests) = encoded(spec.name)
        TrainGrid.run(spark, spec, dir, manifests, arch,
          TrainGrid.defaultTask(spec), epochs = epochs)
      }
      println(TrainGrid.render(rows.flatten))

      val cars = SyntheticImages.cars
      val (carsDir, carsManifests) = encoded(cars.name)
      val tasks = Seq(
        TrainGrid.Task("make-only", 4, SyntheticImages.makeLabel(cars, _)),
        TrainGrid.Task("is-make-0", 2, SyntheticImages.isMakeZeroLabel(cars, _)))
      val coarse = tasks.flatMap(t => TrainGrid.run(spark, cars, carsDir, carsManifests,
        Features.shufflenetLite, t, epochs = epochs, lr = 1.0))
      println(TrainGrid.render(coarse))
    } finally spark.stop()
  }
}
