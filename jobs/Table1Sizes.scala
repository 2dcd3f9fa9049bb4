package repro.jobs

import org.apache.spark.sql.SparkSession

import repro.core.ScanSizes
import repro.imaging.SyntheticImages

/** Reproduces Table 1: per-scan size-reduction factors and mean image size
  * for each dataset. Usage: `spark-submit ... Table1Sizes [sf]`.
  */
object Table1Sizes {

  /** Render the table from measurements; shared with the bench suite. */
  def render(spark: SparkSession, sf: Double): String = {
    val rows = SyntheticImages.all.map { spec =>
      val s = ScanSizes.measure(spark, spec, sf)
      f"| ${s.dataset}%-9s | ${s.reductionFactor(1)}%5.1fx | ${s.reductionFactor(2)}%5.1fx " +
        f"| ${s.reductionFactor(5)}%5.1fx | ${s.reductionFactor(10)}%5.1fx " +
        f"| ${s.meanFullBytes / 1000.0}%7.1f kB |"
    }
    ("| Dataset   | Scan 1 | Scan 2 | Scan 5 | Scan 10 | E[s(x)]    |" +:
      "|-----------|--------|--------|--------|---------|------------|" +:
      rows).mkString("\n")
  }

  def main(args: Array[String]): Unit = {
    val sf = args.headOption.map(_.toDouble).getOrElse(0.1)
    val spark = SparkSession.builder.appName("pcr-table1").getOrCreate()
    try println(render(spark, sf))
    finally spark.stop()
  }
}
