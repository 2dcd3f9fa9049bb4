package repro.core

import java.nio.file.Files

import org.apache.spark.sql.functions._

import repro.{Oracle, SparkSpec, SynthData}
import repro.imaging.SyntheticImages

/** The DataSourceV2 `pcr` reader: fidelity option, schema, and SQL-level
  * equivalence of the metadata path against DuckDB.
  */
class PcrDataSourceSpec extends SparkSpec {

  private lazy val dir = Files.createTempDirectory("pcr-dsv2").toString
  private val spec = SyntheticImages.celebahq
  private val sf = 0.05 // 120 images → 2 records of 96/24
  private lazy val manifests = PcrEncoder.encodeDataset(spark, spec, sf, dir)

  private def read(g: Int) = {
    manifests // force encoding
    spark.read.format("pcr").option("scanGroup", g).load(dir)
  }

  test("the format is registered under its short name and lists all images") {
    assert(read(10).count() == spec.numImages(sf))
  }

  test("schema matches the documented layout") {
    assert(read(5).schema.fieldNames.toSeq ==
      Seq("id", "label", "width", "height", "scan_group", "bytes_read", "y", "cb", "cr"))
  }

  test("scan_group column reflects the requested fidelity") {
    assert(read(2).select("scan_group").distinct().collect().map(_.getInt(0)).toSeq == Seq(2))
  }

  test("bytes_read shrinks with the scan group") {
    def meanBytes(g: Int): Double =
      read(g).agg(avg("bytes_read")).collect()(0).getDouble(0)
    val b1 = meanBytes(1); val b5 = meanBytes(5); val b10 = meanBytes(10)
    assert(b1 < b5 && b5 < b10, s"$b1, $b5, $b10")
    assert(b10 / b1 > 3, s"scan-1 reduction only ${b10 / b1}")
  }

  test("decoded planes have the right sizes") {
    val r = read(10).select("width", "height", "y", "cb").head()
    val w = r.getInt(0); val h = r.getInt(1)
    assert(r.getAs[Array[Byte]]("y").length == w * h)
    assert(r.getAs[Array[Byte]]("cb").length == w * h / 4)
  }

  test("full-fidelity planes equal the library decoder's output") {
    val rows = read(10).select("id", "y").collect().map(r => r.getLong(0) -> r.getAs[Array[Byte]](1)).toMap
    val direct = PcrDecoder.readRecord(manifests.head.path, 10)
    for (d <- direct.take(3)) {
      val viaSpark = rows(d.id).map(b => b & 0xff)
      assert(viaSpark.sameElements(d.image.y), s"image ${d.id}")
    }
  }

  test("label aggregation through the DSv2 path matches DuckDB (Oracle)") {
    val df = read(10).groupBy("label").agg(count(lit(1)) as "n")
    val meta = SynthData.imageMeta(spark, spec.name, sf)
    Oracle.assertEquivalent(df,
      "SELECT label, count(*) AS n FROM meta GROUP BY label",
      "meta" -> meta)
  }

  test("per-label mean bytes_read through SQL matches DuckDB") {
    val df = read(5).select("id", "label", "bytes_read")
    df.createOrReplaceTempView("pcr5")
    val agg = spark.sql(
      "SELECT label, round(avg(bytes_read), 3) AS mean_bytes FROM pcr5 GROUP BY label")
    Oracle.assertEquivalent(agg,
      "SELECT label, round(avg(CAST(bytes_read AS DOUBLE)), 3) AS mean_bytes " +
        "FROM pcr5 GROUP BY label",
      "pcr5" -> df)
  }

  test("a missing path is rejected") {
    assertThrows[Exception](spark.read.format("pcr").load("/nonexistent-dir-xyz").count())
  }

  test("scanGroup below 1 is rejected") {
    assertThrows[Exception](read(0).count())
  }
}
