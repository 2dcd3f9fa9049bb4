package repro.train

import java.nio.file.Files

import repro.SparkSpec
import repro.core.PcrEncoder
import repro.imaging.{Rng, SyntheticImages}

class TrainerSpec extends SparkSpec {

  private lazy val pcrDir = {
    val d = Files.createTempDirectory("pcr-train").toString
    PcrEncoder.encodeDataset(spark, SyntheticImages.celebahq, 0.05, d)
    d
  }

  private def toyData(n: Int, dim: Int, seed: Long) = {
    import spark.implicits._
    val rng = new Rng(seed)
    val rows = (0 until n).map { i =>
      val label = i % 2
      val x = Array.tabulate(dim)(j =>
        rng.nextGaussian() + (if (j == 0) (if (label == 0) -2.0 else 2.0) else 0.0))
      LabeledVec(i.toLong, label, x)
    }
    spark.createDataset(rows)
  }

  test("spark gradient equals a local computation") {
    val ds = toyData(50, 3, 1)
    val local = ds.collect()
    val rng = new Rng(2)
    val p = SoftmaxParams(2, 3, Array.fill(2 * 3 + 2)(rng.nextGaussian() * 0.1))
    val (gSpark, lossSpark, n) = Trainer.gradient(ds, p)
    val gLocal = new Array[Double](p.theta.length)
    var lossLocal = 0.0
    local.foreach(v => lossLocal += SoftmaxModel.accumulate(p, v.features, v.label, gLocal))
    gLocal.indices.foreach(i => gLocal(i) /= local.length)
    assert(n == 50)
    assert(math.abs(lossSpark - lossLocal / local.length) < 1e-10)
    gSpark.zip(gLocal).foreach { case (a, b) => assert(math.abs(a - b) < 1e-10) }
  }

  test("training reduces the loss monotonically on easy data") {
    val ds = toyData(100, 3, 3).cache()
    val (p, stats) = Trainer.train(ds, SoftmaxModel.init(2, 3), epochs = 15, lr = 0.5)
    assert(stats.head.loss > stats.last.loss)
    stats.sliding(2).foreach { case Seq(a, b) => assert(b.loss <= a.loss + 1e-9) }
    assert(Trainer.accuracy(ds, p) > 0.9)
  }

  test("featuresAt reads PCR data into labeled feature vectors") {
    val ds = Trainer.featuresAt(spark, pcrDir, 5, Features.resnetLite)
    val rows = ds.collect()
    assert(rows.length == SyntheticImages.celebahq.numImages(0.05))
    val expectedDim = Features.dim(Features.resnetLite, 64, 64)
    rows.foreach { v =>
      assert(v.features.length == expectedDim)
      assert(v.features.forall(f => f >= -0.5 && f <= 0.5))
      assert(v.label == SyntheticImages.label(SyntheticImages.celebahq, v.id))
    }
  }

  test("fullres features carry more dimensions than lowpass") {
    val lo = Trainer.featuresAt(spark, pcrDir, 10, Features.resnetLite).head()
    val hi = Trainer.featuresAt(spark, pcrDir, 10, Features.shufflenetLite).head()
    assert(hi.features.length == 16 * lo.features.length)
  }

  test("labelMap remaps labels for coarse tasks") {
    val ds = Trainer.featuresAt(spark, pcrDir, 10, Features.resnetLite, labelMap = _ => 0)
    assert(ds.collect().forall(_.label == 0))
  }

  test("a model trained on full-fidelity celebahq beats chance") {
    val ds = Trainer.featuresAt(spark, pcrDir, 10, Features.resnetLite).cache()
    val train = ds.filter((v: LabeledVec) => !Trainer.isTest(v.id))
    val test = ds.filter((v: LabeledVec) => Trainer.isTest(v.id))
    val dim = Features.dim(Features.resnetLite, 64, 64)
    val (p, _) = Trainer.train(train, SoftmaxModel.init(2, dim), epochs = 40, lr = 2.0)
    val acc = Trainer.accuracy(test, p)
    assert(acc > 0.75, s"test accuracy $acc")
  }

  test("the id-based split is deterministic and ~20% test") {
    val testFrac = (0L until 1000L).count(Trainer.isTest).toDouble / 1000
    assert(math.abs(testFrac - 0.2) < 0.01)
  }
}
