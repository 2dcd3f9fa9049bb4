package repro.jobs

import org.apache.spark.sql.SparkSession


/** Reproduces Table 3: encode all datasets as PCR directories and report
  * record/image/size statistics. Usage: `Table3Datasets [sf] [outDir]`.
  */
object Table3Datasets {
  def main(args: Array[String]): Unit = {
    val sf = args.headOption.map(_.toDouble).getOrElse(0.1)
    val out = args.lift(1).getOrElse(
      java.nio.file.Files.createTempDirectory("pcr-table3").toString)
    val spark = SparkSession.builder.appName("pcr-table3").getOrCreate()
    try println(repro.experiments.Table3Datasets.render(repro.experiments.Table3Datasets.measureAll(spark, sf, out)))
    finally spark.stop()
  }
}
