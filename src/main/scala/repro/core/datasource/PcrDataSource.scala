package repro.core.datasource

import java.util

import scala.jdk.CollectionConverters._

import org.apache.spark.sql.catalyst.InternalRow
import org.apache.spark.sql.catalyst.expressions.GenericInternalRow
import org.apache.spark.sql.connector.catalog.{SupportsRead, Table, TableCapability, TableProvider}
import org.apache.spark.sql.connector.expressions.Transform
import org.apache.spark.sql.connector.read._
import org.apache.spark.sql.sources.DataSourceRegister
import org.apache.spark.sql.types._
import org.apache.spark.sql.util.CaseInsensitiveStringMap

import repro.core.PcrDecoder

/** DataSourceV2 reader for PCR directories — the Spark embodiment of the
  * paper's loader (§5): each partition reads one record file's byte
  * *prefix* at the requested fidelity and decodes it inside the executor.
  *
  * {{{
  * spark.read.format("pcr")
  *      .option("scanGroup", 5)   // fidelity knob; default = all groups
  *      .load(dir)
  * }}}
  *
  * Schema: `id, label, width, height, scan_group, bytes_read, y, cb, cr`
  * where `bytes_read` is the record prefix length amortized per image and
  * the planes are decoded pixels (one unsigned byte each).
  */
class PcrDataSource extends TableProvider with DataSourceRegister {
  override def shortName(): String = "pcr"

  override def inferSchema(options: CaseInsensitiveStringMap): StructType = PcrTable.schema

  override def getTable(
      schema: StructType,
      partitioning: Array[Transform],
      properties: util.Map[String, String]): Table =
    new PcrTable(Option(properties.get("path")))
}

object PcrTable {
  val schema: StructType = StructType(Seq(
    StructField("id", LongType, nullable = false),
    StructField("label", IntegerType, nullable = false),
    StructField("width", IntegerType, nullable = false),
    StructField("height", IntegerType, nullable = false),
    StructField("scan_group", IntegerType, nullable = false),
    StructField("bytes_read", DoubleType, nullable = false),
    StructField("y", BinaryType, nullable = false),
    StructField("cb", BinaryType, nullable = false),
    StructField("cr", BinaryType, nullable = false)))
}

class PcrTable(tablePath: Option[String]) extends Table with SupportsRead {
  override def name(): String = s"pcr(${tablePath.getOrElse("?")})"
  override def schema(): StructType = PcrTable.schema
  override def capabilities(): util.Set[TableCapability] =
    Set(TableCapability.BATCH_READ).asJava

  override def newScanBuilder(options: CaseInsensitiveStringMap): ScanBuilder = {
    val dir = Option(options.get("path")).orElse(tablePath).getOrElse(
      throw new IllegalArgumentException("pcr source requires a path"))
    val scanGroup = Option(options.get("scanGroup")).map(_.toInt).getOrElse(Int.MaxValue)
    require(scanGroup >= 1, s"scanGroup must be >= 1, got $scanGroup")
    new PcrScanBuilder(dir, scanGroup)
  }
}

class PcrScanBuilder(dir: String, scanGroup: Int) extends ScanBuilder {
  override def build(): Scan = new PcrScan(dir, scanGroup)
}

class PcrScan(dir: String, scanGroup: Int) extends Scan with Batch {
  override def readSchema(): StructType = PcrTable.schema
  override def toBatch: Batch = this
  override def description(): String = s"PcrScan(dir=$dir, scanGroup=$scanGroup)"

  override def planInputPartitions(): Array[InputPartition] =
    repro.core.PcrEncoder.listRecords(dir)
      .map(p => PcrInputPartition(p, scanGroup): InputPartition)
      .toArray

  override def createReaderFactory(): PartitionReaderFactory = new PcrReaderFactory
}

case class PcrInputPartition(path: String, scanGroup: Int) extends InputPartition

class PcrReaderFactory extends PartitionReaderFactory {
  override def createReader(partition: InputPartition): PartitionReader[InternalRow] = {
    val p = partition.asInstanceOf[PcrInputPartition]
    new PcrPartitionReader(p.path, p.scanGroup)
  }
}

/** Reads one record file's prefix and emits one row per decoded image. */
class PcrPartitionReader(path: String, scanGroup: Int) extends PartitionReader[InternalRow] {
  private lazy val images = PcrDecoder.readRecord(path, scanGroup).iterator
  private var current: InternalRow = _

  private def planeBytes(p: Array[Int]): Array[Byte] = {
    val out = new Array[Byte](p.length)
    var i = 0
    while (i < p.length) { out(i) = p(i).toByte; i += 1 }
    out
  }

  override def next(): Boolean =
    if (!images.hasNext) false
    else {
      val d = images.next()
      current = new GenericInternalRow(Array[Any](
        d.id, d.label, d.image.width, d.image.height, d.scanGroup, d.bytesRead,
        planeBytes(d.image.y), planeBytes(d.image.cb), planeBytes(d.image.cr)))
      true
    }

  override def get(): InternalRow = current
  override def close(): Unit = ()
}
