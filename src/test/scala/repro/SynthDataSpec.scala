package repro

import org.apache.spark.sql.functions._

/** Sanity checks of the provided TPC-H-lite generators and the DuckDB
  * oracle wiring (the same oracle validates the PCR metadata SQL path).
  */
class SynthDataSpec extends SparkSpec {

  test("lineitem generates the scaled row count with the TPC-H columns") {
    val li = SynthData.lineitem(spark, sf = 0.001)
    assert(li.count() == 6000)
    assert(li.columns.contains("l_orderkey") && li.columns.contains("l_shipdate"))
  }

  test("an aggregation over lineitem matches DuckDB") {
    val li = SynthData.lineitem(spark, sf = 0.0005).cache()
    val agg = li.groupBy("l_returnflag")
      .agg(count(lit(1)) as "n", round(sum("l_quantity"), 2) as "qty")
    Oracle.assertEquivalent(agg,
      "SELECT l_returnflag, count(*) AS n, round(sum(CAST(l_quantity AS DOUBLE)), 2) AS qty " +
        "FROM lineitem GROUP BY l_returnflag",
      "lineitem" -> li)
  }

  test("orders join customer matches DuckDB") {
    val o = SynthData.orders(spark, sf = 0.001).cache()
    val c = SynthData.customer(spark, sf = 0.001).cache()
    val joined = o.join(c, o("o_custkey") === c("c_custkey"))
      .groupBy("c_mktsegment").agg(count(lit(1)) as "n")
    Oracle.assertEquivalent(joined,
      "SELECT c_mktsegment, count(*) AS n FROM orders o " +
        "JOIN customer c ON CAST(o.o_custkey AS BIGINT) = CAST(c.c_custkey AS BIGINT) " +
        "GROUP BY c_mktsegment",
      "orders" -> o, "customer" -> c)
  }

  test("imageMeta exposes the image datasets with balanced labels") {
    val meta = SynthData.imageMeta(spark, "imagenet", sf = 0.01)
    assert(meta.count() == 128)
    val perLabel = meta.groupBy("label").count().collect().map(_.getLong(1))
    assert(perLabel.max - perLabel.min <= 1, s"unbalanced: ${perLabel.toSeq}")
    assertThrows[IllegalArgumentException](SynthData.imageMeta(spark, "nope"))
  }

  test("zipf keys are skewed, uniform keys are not") {
    val z = SynthData.zipfKeys(spark, 20000, 1000)
    val topShare = z.groupBy("k").count().orderBy(desc("count")).limit(1)
      .collect()(0).getLong(1).toDouble / 20000
    val u = SynthData.uniformKeys(spark, 20000, 1000)
    val topShareU = u.groupBy("k").count().orderBy(desc("count")).limit(1)
      .collect()(0).getLong(1).toDouble / 20000
    assert(topShare > 5 * topShareU, s"zipf top=$topShare uniform top=$topShareU")
  }
}
