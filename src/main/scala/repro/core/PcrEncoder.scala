package repro.core

import java.nio.file.{Files, Paths}

import org.apache.spark.sql.{Dataset, SparkSession}

import repro.imaging.{DatasetSpec, SyntheticImages}
import repro.jpeg.{Codec, ScanScript, ScanSpec}

/** Where one encoded record landed and how large each fidelity prefix is. */
final case class RecordManifest(
    path: String,
    recordIndex: Long,
    nImages: Int,
    totalBytes: Long,
    groupEndOffsets: Seq[Long]) {
  def prefixBytes(scanGroup: Int): Long = groupEndOffsets(scanGroup)
}

/** The PCR encoder (§5 "Encoding") as a Spark job.
  *
  * Image ids are grouped into records of `spec.imagesPerRecord`, each group
  * is encoded on an executor (generate pixels → progressive-encode → gather
  * scans into scan groups → serialize with the offset index), and the record
  * file is written to the local filesystem. Only (id, record) pairs are
  * shuffled — pixels never leave the executor that generates them.
  */
object PcrEncoder {

  /** Encode dataset `spec` at scale `sf` into `outDir/record-NNNNN.pcr`.
    * Returns one manifest per record, ordered by record index.
    */
  def encodeDataset(
      spark: SparkSession,
      spec: DatasetSpec,
      sf: Double,
      outDir: String,
      seed: Long = 0L,
      script: Seq[ScanSpec] = ScanScript.progressive10): Seq[RecordManifest] = {
    import spark.implicits._
    Files.createDirectories(Paths.get(outDir))
    val n = spec.numImages(sf)
    val ipr = spec.imagesPerRecord
    val scriptV = script.toVector

    val ids: Dataset[Long] = spark.range(n).as[Long]
    ids
      .groupByKey(_ / ipr)
      .mapGroups { (rec, idIter) =>
        val recIds = idIter.toArray.sorted
        val entries = recIds.map { id =>
          val img = SyntheticImages.generate(spec, id, seed)
          val scans = Codec.encodeProgressive(img, spec.quality, scriptV)
          PcrImageEntry(id, SyntheticImages.label(spec, id), scans)
        }
        val bytes = PcrRecord.serialize(spec.width, spec.height, spec.quality, entries.toSeq)
        val path = Paths.get(outDir, f"record-$rec%05d.pcr")
        Files.write(path, bytes)
        val header = PcrRecord.parseHeader(bytes)
        RecordManifest(path.toString, rec, entries.length, bytes.length.toLong,
          header.groupEndOffsets.toSeq)
      }
      .collect()
      .sortBy(_.recordIndex)
      .toSeq
  }

  /** List the record files of an encoded dataset directory, sorted. */
  def listRecords(dir: String): Seq[String] = {
    import scala.jdk.CollectionConverters._
    val d = Paths.get(dir)
    require(Files.isDirectory(d), s"not a PCR directory: $dir")
    val s = Files.list(d)
    try s.iterator().asScala.map(_.toString).filter(_.endsWith(".pcr")).toSeq.sorted
    finally s.close()
  }
}
