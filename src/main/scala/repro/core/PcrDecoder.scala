package repro.core

import java.io.RandomAccessFile

import repro.imaging.PlanarImage
import repro.jpeg.{Codec, ScanScript, ScanSpec}

/** One image decoded from a PCR record at some fidelity. `bytesRead` is the
  * record-prefix length amortized over the record's images — the quantity
  * the paper's I/O model (Thm 4.1) is built on.
  */
final case class DecodedImage(
    id: Long,
    label: Int,
    scanGroup: Int,
    bytesRead: Double,
    image: PlanarImage)

/** The PCR decoder (§5 "Decoding"): read the record-file byte prefix up to
  * the requested scan group's end offset, regroup per-image scans, and hand
  * each truncated stream to the JPEG decoder (the EOI-termination trick —
  * here the codec natively decodes scan prefixes).
  */
object PcrDecoder {

  /** Read only the header of a record file (metadata + offset index). */
  def readHeader(path: String): PcrHeader = {
    val raf = new RandomAccessFile(path, "r")
    try {
      val fixed = new Array[Byte](24)
      raf.readFully(fixed)
      val bb = java.nio.ByteBuffer.wrap(fixed)
      require(bb.getInt() == PcrRecord.Magic, s"$path is not a PCR record")
      val n = bb.getInt(); val ng = bb.getInt()
      val headerLen = 24 + 12 * n + 8 * (ng + 1)
      raf.seek(0)
      val hdr = new Array[Byte](headerLen)
      raf.readFully(hdr)
      PcrRecord.parseHeader(hdr)
    } finally raf.close()
  }

  /** Bytes a reader must fetch from `path` for fidelity `scanGroup`. */
  def prefixBytes(path: String, scanGroup: Int): Long =
    readHeader(path).prefixLength(scanGroup)

  /** Read the prefix of `path` for `scanGroup` and return raw entries plus
    * the header — no pixel decoding (the reader microbenchmark path). The
    * file is opened once: fixed header → offset index → prefix read.
    */
  def readRecordRaw(path: String, scanGroup: Int): (PcrHeader, Seq[PcrImageEntry]) = {
    val raf = new RandomAccessFile(path, "r")
    try {
      val fixed = new Array[Byte](24)
      raf.readFully(fixed)
      val bb = java.nio.ByteBuffer.wrap(fixed)
      require(bb.getInt() == PcrRecord.Magic, s"$path is not a PCR record")
      val n = bb.getInt(); val ng = bb.getInt()
      val headerLen = 24 + 12 * n + 8 * (ng + 1)
      raf.seek(0)
      val hdr = new Array[Byte](headerLen)
      raf.readFully(hdr)
      val header = PcrRecord.parseHeader(hdr)
      val g = math.min(scanGroup, header.nScanGroups)
      val prefixLen = header.prefixLength(g)
      raf.seek(0)
      val bytes = new Array[Byte](prefixLen.toInt)
      raf.readFully(bytes)
      PcrRecord.parsePrefix(bytes, g)
    } finally raf.close()
  }

  /** Read + decode every image of a record at fidelity `scanGroup` (capped
    * to the record's group count).
    */
  def readRecord(
      path: String,
      scanGroup: Int,
      script: Seq[ScanSpec] = ScanScript.progressive10): Seq[DecodedImage] = {
    val (header, entries) = readRecordRaw(path, scanGroup)
    val g = math.min(scanGroup, header.nScanGroups)
    val perImageBytes = header.prefixLength(g).toDouble / header.nImages
    entries.map { e =>
      val img = Codec.decodeProgressive(e.scans, header.quality, header.width, header.height, script)
      DecodedImage(e.id, e.label, g, perImageBytes, img)
    }
  }
}
