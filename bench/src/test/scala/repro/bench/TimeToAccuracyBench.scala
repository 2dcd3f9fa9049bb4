package repro.bench

import repro.SparkSpec
import repro.experiments.{TrainGrid, TrainPoint}
import repro.imaging.SyntheticImages
import repro.train.Features

/** Figures 7/10/11/12 and Observations 1–3 — time-to-accuracy per scan.
  *
  * Paper shape:
  *  - lower scans cut epoch time roughly by their size ratio (Obs 1, ~2×);
  *  - the robust model (ResNet) tolerates scans 1–2, the sensitive fast
  *    model (ShuffleNet) needs scan 5 on HAM10000 (Obs 2, Fig 10);
  *  - coarser relabelings of Cars close the gap between scan groups
  *    (Obs 3, Fig 11);
  *  - lower fidelity never *improves* per-epoch accuracy (Fig 12).
  */
class TimeToAccuracyBench extends SparkSpec {

  private def grid(spec: repro.imaging.DatasetSpec,
                   arch: Features.ModelArch,
                   task: TrainGrid.Task,
                   epochs: Int = 40,
                   lr: Double = 2.0): Seq[TrainPoint] = {
    val (dir, manifests) = BenchData.pcrDataset(spec)
    TrainGrid.run(spark, spec, dir, manifests, arch, task, epochs = epochs, lr = lr)
  }

  private lazy val celebResnet = grid(SyntheticImages.celebahq, Features.resnetLite,
    TrainGrid.defaultTask(SyntheticImages.celebahq))
  private lazy val celebShuffle = grid(SyntheticImages.celebahq, Features.shufflenetLite,
    TrainGrid.defaultTask(SyntheticImages.celebahq))
  private lazy val hamResnet = grid(SyntheticImages.ham10000, Features.resnetLite,
    TrainGrid.defaultTask(SyntheticImages.ham10000), epochs = 60)
  private lazy val hamShuffle = grid(SyntheticImages.ham10000, Features.shufflenetLite,
    TrainGrid.defaultTask(SyntheticImages.ham10000), epochs = 60)

  private lazy val carsTasks = {
    val spec = SyntheticImages.cars
    val tasks = Seq(
      TrainGrid.Task("baseline", 32, identity),
      TrainGrid.Task("make-only", 4, SyntheticImages.makeLabel(spec, _)),
      TrainGrid.Task("is-make-0", 2, SyntheticImages.isMakeZeroLabel(spec, _)))
    tasks.flatMap(t => grid(spec, Features.shufflenetLite, t, epochs = 60, lr = 1.0))
  }

  private def acc(rows: Seq[TrainPoint], g: Int): Double =
    rows.find(_.scanGroup == g).get.testAccuracy

  test("report the full time-to-accuracy grid") {
    BenchData.report("Fig 7/10 (time-to-accuracy)")(
      TrainGrid.render(celebResnet ++ celebShuffle ++ hamResnet ++ hamShuffle))
    BenchData.report("Fig 11 (Cars task coarsening, shufflenet-lite)")(
      TrainGrid.render(carsTasks))
  }

  test("epoch time grows with the scan group and scan 5 is ~2× faster than 10") {
    // Epoch times are monotone for every combination; the ~2× scan-5
    // speedup shows on IO-pressured combinations (the fast model), while
    // the slower model goes compute-bound below scan 10 — both paper
    // behaviours (Fig 5 vs Fig 16).
    for (rows <- Seq(celebResnet, celebShuffle, hamResnet, hamShuffle)) {
      val t = Seq(1, 2, 5, 10).map(g => rows.find(_.scanGroup == g).get.epochSeconds)
      t.sliding(2).foreach { case Seq(a, b) => assert(b >= a, s"epoch times $t") }
    }
    for (rows <- Seq(celebShuffle, hamShuffle)) {
      val t5 = rows.find(_.scanGroup == 5).get.epochSeconds
      val t10 = rows.find(_.scanGroup == 10).get.epochSeconds
      assert(t10 / t5 > 1.2, s"scan5 epoch speedup only ${t10 / t5}")
    }
  }

  test("CelebAHQ (low-frequency task) tolerates even scan 1 (Obs 1)") {
    for (rows <- Seq(celebResnet, celebShuffle)) {
      assert(acc(rows, 10) > 0.75, s"baseline failed to learn: ${acc(rows, 10)}")
      assert(acc(rows, 1) > acc(rows, 10) - 0.08,
        s"scan1 ${acc(rows, 1)} vs scan10 ${acc(rows, 10)}")
    }
  }

  test("on HAM10000 the sensitive model needs higher scans than the robust one (Obs 2)") {
    val dropRobust = acc(hamResnet, 10) - acc(hamResnet, 1)
    val dropSensitive = acc(hamShuffle, 10) - acc(hamShuffle, 1)
    assert(dropSensitive > dropRobust - 0.02,
      s"sensitive drop $dropSensitive vs robust drop $dropRobust")
    assert(acc(hamShuffle, 5) > acc(hamShuffle, 1),
      s"scan5 ${acc(hamShuffle, 5)} not above scan1 ${acc(hamShuffle, 1)}")
  }

  test("coarser Cars tasks close the scan-group accuracy gap (Obs 3)") {
    def gap(task: String): Double = {
      val rows = carsTasks.filter(_.task == task)
      rows.find(_.scanGroup == 10).get.testAccuracy -
        rows.find(_.scanGroup == 1).get.testAccuracy
    }
    val fine = gap("baseline"); val make = gap("make-only"); val binary = gap("is-make-0")
    assert(binary < fine, s"binary gap $binary not below fine gap $fine")
    assert(make <= fine + 0.03, s"make gap $make vs fine gap $fine")
  }

  test("lower fidelity does not act as beneficial augmentation (Fig 12)") {
    for (rows <- Seq(hamShuffle, celebResnet))
      assert(acc(rows, 1) <= acc(rows, 10) + 0.06,
        s"scan1 ${acc(rows, 1)} improbably above scan10 ${acc(rows, 10)}")
  }

  test("time-to-accuracy: lower scans finish the same epochs sooner") {
    for (rows <- Seq(celebResnet, hamShuffle, celebShuffle)) {
      val t1 = rows.find(_.scanGroup == 1).get.totalSeconds
      val t10 = rows.find(_.scanGroup == 10).get.totalSeconds
      assert(t1 < t10, s"scan1 total $t1 not below scan10 total $t10")
    }
  }
}
