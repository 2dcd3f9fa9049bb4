package repro.jobs

import repro.experiments.MssimExp
import repro.imaging.SyntheticImages

/** Reproduces Figures 13/23: mean MSSIM per scan group for each dataset.
  * Usage: `MssimReport [imagesPerDataset]`.
  */
object MssimReport {
  def main(args: Array[String]): Unit = {
    val n = args.headOption.map(_.toInt).getOrElse(24)
    println(MssimExp.render(SyntheticImages.all.map { spec =>
      MssimExp.measure(spec, if (spec.width >= 128) n / 2 else n)
    }))
  }
}
