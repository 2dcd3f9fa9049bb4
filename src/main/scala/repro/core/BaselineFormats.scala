package repro.core

import java.nio.ByteBuffer
import java.nio.file.{Files, Paths}

import org.apache.spark.sql.SparkSession

import repro.imaging.{DatasetSpec, PlanarImage, SyntheticImages}
import repro.jpeg.Codec

/** The baseline storage layouts the paper compares against (§2, Figure 2):
  * a TFRecord-like sequential record format and a File-per-Image directory.
  * Both carry baseline (sequential) JPEG payloads at a fixed fidelity —
  * the defining limitation PCRs remove.
  */
object BaselineFormats {

  val RecordMagic: Int = 0x54465231 // "TFR1"

  // ------------------------------------------------------- TFRecord-like

  /** Record file layout: magic, image count, dims/quality, then per image
    * `[id long][label int][len int][sequential JPEG payload]`.
    */
  def serializeRecord(
      width: Int, height: Int, quality: Int,
      images: Seq[(Long, Int, Array[Byte])]): Array[Byte] = {
    val total = 24 + images.map(i => 16 + i._3.length).sum
    val bb = ByteBuffer.allocate(total)
    bb.putInt(RecordMagic).putInt(images.size).putInt(width).putInt(height).putInt(quality)
    bb.putInt(0) // reserved
    images.foreach { case (id, label, payload) =>
      bb.putLong(id).putInt(label).putInt(payload.length).put(payload)
    }
    bb.array()
  }

  def parseRecord(bytes: Array[Byte]): (Int, Int, Int, Seq[(Long, Int, Array[Byte])]) = {
    val bb = ByteBuffer.wrap(bytes)
    require(bb.getInt() == RecordMagic, "not a TFR1 record")
    val n = bb.getInt(); val w = bb.getInt(); val h = bb.getInt(); val q = bb.getInt()
    bb.getInt() // reserved
    val images = (0 until n).map { _ =>
      val id = bb.getLong(); val label = bb.getInt(); val len = bb.getInt()
      val payload = new Array[Byte](len)
      bb.get(payload)
      (id, label, payload)
    }
    (w, h, q, images)
  }

  /** Encode `spec` at `sf` as TFRecord-like files (one per record group),
    * optionally re-encoding at an overridden JPEG quality (the paper's
    * static-compression baselines of Fig 22). Returns (path, bytes) pairs.
    */
  def writeTfRecordLike(
      spark: SparkSession,
      spec: DatasetSpec,
      sf: Double,
      outDir: String,
      seed: Long = 0L,
      qualityOverride: Option[Int] = None): Seq[(String, Long)] = {
    import spark.implicits._
    Files.createDirectories(Paths.get(outDir))
    val n = spec.numImages(sf)
    val q = qualityOverride.getOrElse(spec.quality)
    spark.range(n).as[Long]
      .groupByKey(_ / spec.imagesPerRecord)
      .mapGroups { (rec, ids) =>
        val images = ids.toArray.sorted.map { id =>
          val img = SyntheticImages.generate(spec, id, seed)
          (id, SyntheticImages.label(spec, id), Codec.encodeSequential(img, q))
        }
        val bytes = serializeRecord(spec.width, spec.height, q, images.toSeq)
        val path = Paths.get(outDir, f"record-$rec%05d.tfr")
        Files.write(path, bytes)
        (path.toString, bytes.length.toLong)
      }
      .collect().toSeq.sortBy(_._1)
  }

  /** Decode every image of a TFRecord-like file. */
  def readTfRecordLike(path: String): Seq[(Long, Int, PlanarImage)] = {
    val bytes = Files.readAllBytes(Paths.get(path))
    val (w, h, q, images) = parseRecord(bytes)
    images.map { case (id, label, payload) =>
      (id, label, Codec.decodeSequential(payload, q, w, h))
    }
  }

  // ------------------------------------------------------ File-per-Image

  /** Encode `spec` at `sf` as one sequential-JPEG file per image plus a
    * `labels.csv`. Returns (path, bytes) pairs for the image files.
    */
  def writeFilePerImage(
      spark: SparkSession,
      spec: DatasetSpec,
      sf: Double,
      outDir: String,
      seed: Long = 0L): Seq[(String, Long)] = {
    import spark.implicits._
    Files.createDirectories(Paths.get(outDir))
    val n = spec.numImages(sf)
    val files = spark.range(n).as[Long]
      .mapPartitions { ids =>
        ids.map { id =>
          val img = SyntheticImages.generate(spec, id, seed)
          val payload = Codec.encodeSequential(img, spec.quality)
          val path = Paths.get(outDir, f"img-$id%08d.jpg")
          Files.write(path, payload)
          (path.toString, payload.length.toLong)
        }
      }
      .collect().toSeq.sortBy(_._1)
    val labels = (0L until n).map(id => s"$id,${SyntheticImages.label(spec, id)}")
    Files.write(Paths.get(outDir, "labels.csv"), labels.mkString("\n").getBytes)
    files
  }
}
