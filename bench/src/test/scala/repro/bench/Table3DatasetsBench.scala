package repro.bench

import repro.SparkSpec
import repro.experiments.Table3Datasets
import repro.imaging.SyntheticImages

/** Table 3 — PCR dataset and record statistics.
  *
  * Paper values: ImageNet 1251 records / 1.28 M images / 129 GiB / 91.7% /
  * 1000 classes; HAM10000 125 / 8012 / 2 GiB / 100% / 7; Cars 63 / 8144 /
  * 887 MiB / 83.8% / 196; CelebAHQ 93 / 24000 / 2 GiB / 75% / 2. Ours are
  * the SF-scaled synthetic equivalents; structure (records ≈ images /
  * imagesPerRecord, per-dataset quality and class counts, HAM largest
  * per-image size) must match.
  */
class Table3DatasetsBench extends SparkSpec {

  private lazy val stats = SyntheticImages.all.map { spec =>
    val (_, manifests) = BenchData.pcrDataset(spec)
    Table3Datasets.fromManifests(spec, manifests)
  }

  test("Table 3: measure and report dataset statistics") {
    BenchData.report(s"Table 3 (datasets, SF=${BenchData.sf})")(Table3Datasets.render(stats))
  }

  test("record counts follow imagesPerRecord grouping") {
    for ((spec, s) <- SyntheticImages.all.zip(stats)) {
      val expected = math.ceil(spec.numImages(BenchData.sf).toDouble / spec.imagesPerRecord).toInt
      assert(s.records == expected, s"${s.dataset}: ${s.records} vs $expected")
      assert(s.images == spec.numImages(BenchData.sf))
    }
  }

  test("quality and class columns mirror the paper's structure") {
    val byName = stats.map(s => s.dataset -> s).toMap
    assert(byName("ham10000").quality == 100 && byName("ham10000").classes == 7)
    assert(byName("celebahq").quality == 75 && byName("celebahq").classes == 2)
    assert(byName("imagenet").images == stats.map(_.images).max,
      "ImageNet must be the largest dataset by image count")
  }

  test("HAM10000 has the largest mean image payload") {
    val perImage = stats.map(s => s.dataset -> s.totalBytes.toDouble / s.images).toMap
    assert(perImage("ham10000") == perImage.values.max)
  }

  test("dataset sizes are nonzero and records exist on disk") {
    for (s <- stats) {
      assert(s.totalBytes > 0 && s.records > 0)
      val (dir, _) = BenchData.pcrDataset(SyntheticImages.byName(s.dataset))
      assert(repro.core.PcrEncoder.listRecords(dir).size == s.records)
    }
  }
}
