package repro.experiments

import org.apache.spark.sql.SparkSession

import repro.core.RecordManifest
import repro.imaging.DatasetSpec
import repro.pipeline.QueueModel
import repro.train.{Features, LabeledVec, SoftmaxModel, Trainer}

/** Figures 7/10/11/12 and §6.2–6.3: time-to-accuracy at each scan group.
  *
  * Accuracy comes from really training the surrogate model on really
  * decoded scan-g pixels (through the DSv2 reader); wall time per epoch
  * comes from the queueing model fed with the measured scan-prefix sizes
  * and the Fig-5 cluster parameters, exactly as the paper separates
  * statistical efficiency (epochs) from hardware efficiency (epoch time).
  */
final case class TrainPoint(
    dataset: String,
    arch: String,
    task: String,
    scanGroup: Int,
    testAccuracy: Double,
    epochSeconds: Double,
    totalSeconds: Double)

object TrainGrid {

  /** A training task: a relabeling of the dataset (paper Fig 11). */
  final case class Task(name: String, numClasses: Int, labelMap: Int => Int)

  def defaultTask(spec: DatasetSpec): Task = Task("baseline", spec.numClasses, identity)

  /** Mean bytes per image after reading up to scan `g`. */
  def meanBytes(manifests: Seq[RecordManifest], g: Int): Double =
    manifests.map(_.prefixBytes(g)).sum.toDouble / manifests.map(_.nImages.toLong).sum

  /** Simulated seconds per epoch at scan `g` on the Fig-5 cluster. */
  def epochSeconds(
      manifests: Seq[RecordManifest],
      g: Int,
      arch: Features.ModelArch,
      nImages: Long): Double = {
    val w = Fig5Throughput.scaledBandwidth(meanBytes(manifests, 10))
    val rate = QueueModel.clusterRate(Fig5Throughput.PaperNodes,
      arch.imagesPerSecPerNode, w, meanBytes(manifests, g))
    QueueModel.epochSeconds(nImages, rate)
  }

  def run(
      spark: SparkSession,
      spec: DatasetSpec,
      pcrDir: String,
      manifests: Seq[RecordManifest],
      arch: Features.ModelArch,
      task: Task,
      scans: Seq[Int] = Seq(1, 2, 5, 10),
      epochs: Int = 40,
      lr: Double = 2.0): Seq[TrainPoint] = {
    val nImages = manifests.map(_.nImages.toLong).sum
    val dim = Features.dim(arch, spec.width, spec.height)
    scans.map { g =>
      val ds = Trainer.featuresAt(spark, pcrDir, g, arch, task.labelMap).cache()
      try {
        val train = ds.filter((v: LabeledVec) => !Trainer.isTest(v.id)).cache()
        val test = ds.filter((v: LabeledVec) => Trainer.isTest(v.id)).cache()
        val (p, _) = Trainer.train(train, SoftmaxModel.init(task.numClasses, dim),
          epochs, lr, scanGroup = g)
        val acc = Trainer.accuracy(test, p)
        val eSec = epochSeconds(manifests, g, arch, nImages)
        TrainPoint(spec.name, arch.name, task.name, g, acc, eSec, eSec * epochs)
      } finally ds.unpersist()
    }
  }

  def render(rows: Seq[TrainPoint]): String = {
    val header = Seq(
      "| Dataset   | Arch            | Task       | Scan | Test acc | s/epoch | Total s |",
      "|-----------|-----------------|------------|------|----------|---------|---------|")
    val body = rows.map { r =>
      f"| ${r.dataset}%-9s | ${r.arch}%-15s | ${r.task}%-10s | ${r.scanGroup}%4d " +
        f"| ${r.testAccuracy * 100}%7.1f%% | ${r.epochSeconds}%7.3f | ${r.totalSeconds}%7.1f |"
    }
    (header ++ body).mkString("\n")
  }
}
