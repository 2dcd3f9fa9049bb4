package repro.jobs

import repro.experiments.Table2Decode
import repro.imaging.SyntheticImages

/** Reproduces Table 2: single-core decode rates per scan vs. baseline.
  * Usage: `spark-submit ... Table2Decode [imagesPerDataset]` (no Spark
  * needed for the measurement itself; kept as a job for uniformity).
  */
object Table2Decode {
  def main(args: Array[String]): Unit = {
    val n = args.headOption.map(_.toInt).getOrElse(200)
    val rows = SyntheticImages.all.map { spec =>
      repro.experiments.Table2Decode.measure(spec, if (spec.width >= 128) n / 2 else n)
    }
    println(repro.experiments.Table2Decode.render(rows))
  }
}
