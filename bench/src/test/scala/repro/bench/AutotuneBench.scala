package repro.bench

import repro.SparkSpec
import repro.experiments.AutotuneExp
import repro.imaging.SyntheticImages
import repro.train.Features

/** Figures 6 and 14 / §6.5 — gradient-similarity autotuning.
  *
  * Paper shape: similarity is exact (1.0) for scan 10 and decreases for
  * lower scans, falling further as the model converges; with a 0.8
  * threshold the tuner trains at high fidelity for the warmup then drops to
  * a cheap scan, matching baseline accuracy at close to scan-5 speed.
  */
class AutotuneBench extends SparkSpec {

  private val spec = SyntheticImages.ham10000

  private lazy val trace = {
    val (dir, _) = BenchData.pcrDataset(spec)
    AutotuneExp.similarityTrace(spark, spec, dir, Features.shufflenetLite,
      epochs = 30, measureEvery = 10, lr = 1.0)
  }

  private lazy val runs = {
    val (dir, manifests) = BenchData.pcrDataset(spec)
    AutotuneExp.compare(spark, spec, dir, manifests, Features.shufflenetLite,
      epochs = 40, lr = 1.0)
  }

  test("Fig 6: report the gradient-similarity trace") {
    BenchData.report("Fig 6 (gradient similarity, HAM10000/shufflenet-lite)")(
      AutotuneExp.renderTrace(trace))
  }

  test("Fig 14: report autotuned vs static runs") {
    BenchData.report("Fig 14 (autotuning vs static schedules)")(
      AutotuneExp.renderRuns(runs))
  }

  test("similarity is exact for scan 10 and ordered by fidelity") {
    for (e <- trace.map(_.epoch).distinct) {
      val byScan = trace.filter(_.epoch == e).map(p => p.scanGroup -> p.similarity).toMap
      assert(byScan(10) == 1.0)
      assert(byScan(1) <= byScan(5) + 0.05, s"epoch $e: $byScan")
      assert(byScan(1) < 1.0 && byScan(5) <= 1.0)
    }
  }

  test("higher-quality scans keep similarity near the baseline (Fig 6)") {
    val lastEpoch = trace.map(_.epoch).max
    val s5 = trace.find(p => p.epoch == lastEpoch && p.scanGroup == 5).get.similarity
    assert(s5 > 0.5, s"scan-5 similarity collapsed: $s5")
  }

  test("the autotuned run is faster than static scan-10 training") {
    val tuned = runs.find(_.name == "autotuned").get
    val static10 = runs.find(_.name == "static scan 10").get
    assert(tuned.totalSimSeconds < static10.totalSimSeconds,
      s"tuned ${tuned.totalSimSeconds} vs static10 ${static10.totalSimSeconds}")
  }

  test("the autotuned run retains accuracy within a few points of baseline") {
    val tuned = runs.find(_.name == "autotuned").get
    val static10 = runs.find(_.name == "static scan 10").get
    assert(tuned.finalTestAccuracy > static10.finalTestAccuracy - 0.10,
      s"tuned ${tuned.finalTestAccuracy} vs static10 ${static10.finalTestAccuracy}")
  }

  test("the tuner starts at the reference scan (warmup) then switches down") {
    val schedule = runs.find(_.name == "autotuned").get.scanSchedule
    assert(schedule.take(5).forall(_ == 10), s"warmup not at scan 10: ${schedule.take(5)}")
    assert(schedule.drop(5).exists(_ < 10), s"tuner never left scan 10: $schedule")
  }
}
