package repro.bench

import repro.SparkSpec
import repro.experiments.{MssimExp, TrainGrid}
import repro.imaging.SyntheticImages
import repro.train.Features

/** Figures 13 and 23 / §6.4 — MSSIM as a compression-level estimator.
  *
  * Paper shape: MSSIM rises monotonically with the scan group, scan 5+
  * sits at ≥ 0.95, and across scans MSSIM correlates with final accuracy.
  */
class MssimBench extends SparkSpec {

  private lazy val rows = SyntheticImages.all.map { spec =>
    MssimExp.measure(spec, nImages = if (spec.width >= 128) 12 else 24)
  }

  test("Fig 23: report per-scan MSSIM") {
    BenchData.report("Fig 23 (mean MSSIM vs full fidelity)")(MssimExp.render(rows))
  }

  test("MSSIM increases monotonically with the scan group") {
    for (r <- rows) {
      assert(r.byScan(1) < r.byScan(5), r.dataset)
      assert(r.byScan(2) < r.byScan(5) + 1e-9, r.dataset)
      assert(r.byScan(5) <= r.byScan(10) + 1e-9, r.dataset)
    }
  }

  test("scan 10 is a perfect reconstruction") {
    rows.foreach(r => assert(math.abs(r.byScan(10) - 1.0) < 1e-9, r.dataset))
  }

  test("scan 5 reaches high structural similarity (paper: 95%+)") {
    rows.foreach(r => assert(r.byScan(5) > 0.85, s"${r.dataset}: ${r.byScan(5)}"))
  }

  test("Fig 13: MSSIM correlates with final test accuracy across scans") {
    val spec = SyntheticImages.cars
    val (dir, manifests) = BenchData.pcrDataset(spec)
    val points = TrainGrid.run(spark, spec, dir, manifests, Features.shufflenetLite,
      TrainGrid.defaultTask(spec), epochs = 50, lr = 1.0)
    val mssim = rows.find(_.dataset == "cars").get
    val scans = Seq(1, 2, 5, 10)
    val xs = scans.map(mssim.byScan)
    val ys = scans.map(g => points.find(_.scanGroup == g).get.testAccuracy)
    val r = MssimExp.correlation(xs, ys)
    BenchData.report("Fig 13 (MSSIM vs accuracy, cars)")(
      scans.zip(xs.zip(ys)).map { case (g, (m, a)) =>
        f"scan $g%2d: mssim=$m%.3f acc=${a * 100}%.1f%%"
      }.mkString("\n") + f"\nPearson r = $r%.3f")
    assert(r > 0.5, s"correlation only $r")
  }
}
