package repro.experiments

import org.apache.spark.sql.SparkSession

import repro.core.PcrEncoder
import repro.imaging.{DatasetSpec, SyntheticImages}

/** Table 3: per-dataset PCR directory statistics — records, images, total
  * size, native JPEG quality, classes.
  */
final case class DatasetStats(
    dataset: String,
    records: Int,
    images: Long,
    totalBytes: Long,
    quality: Int,
    classes: Int)

object Table3Datasets {

  def measure(spark: SparkSession, spec: DatasetSpec, sf: Double, outDir: String): DatasetStats = {
    val manifests = PcrEncoder.encodeDataset(spark, spec, sf, outDir)
    DatasetStats(spec.name, manifests.size, manifests.map(_.nImages.toLong).sum,
      manifests.map(_.totalBytes).sum, spec.quality, spec.numClasses)
  }

  def measureAll(spark: SparkSession, sf: Double, baseDir: String): Seq[DatasetStats] =
    SyntheticImages.all.map(spec =>
      measure(spark, spec, sf, s"$baseDir/${spec.name}"))

  /** Build the stats from an already-encoded dataset's manifests. */
  def fromManifests(spec: DatasetSpec, manifests: Seq[repro.core.RecordManifest]): DatasetStats =
    DatasetStats(spec.name, manifests.size, manifests.map(_.nImages.toLong).sum,
      manifests.map(_.totalBytes).sum, spec.quality, spec.numClasses)

  def render(rows: Seq[DatasetStats]): String = {
    val header = Seq(
      "| Dataset   | Records | Images | Size      | Quality | Classes |",
      "|-----------|---------|--------|-----------|---------|---------|")
    val body = rows.map { r =>
      f"| ${r.dataset}%-9s | ${r.records}%7d | ${r.images}%6d " +
        f"| ${r.totalBytes / 1024.0 / 1024.0}%6.2f MiB | ${r.quality}%6d%% | ${r.classes}%7d |"
    }
    (header ++ body).mkString("\n")
  }
}
