package repro.tpcds

import java.nio.file.Files
import repro.SparkSpec

class TpcdsLiteSpec extends SparkSpec {
  private val sf = 0.002

  test("all eight tables generate") {
    val ts = TpcdsLite.tables(spark, sf)
    assert(ts.keySet == TpcdsLite.tableNames.toSet)
  }

  test("fact-table cardinalities scale with sf") {
    assert(TpcdsLite.storeSales(spark, sf).count() == (2880000 * sf).toLong)
    assert(TpcdsLite.webSales(spark, sf).count() == (720000 * sf).toLong)
  }

  test("date_dim is a fixed-size calendar starting 1992-01-01") {
    val dd = TpcdsLite.dateDim(spark).collect()
    assert(dd.length == TpcdsLite.NDateDim)
    val first = dd.minBy(_.getAs[Long]("d_date_sk"))
    assert(first.getAs[String]("d_date") == "1992-01-01")
    assert(first.getAs[Int]("d_year") == 1992)
  }

  test("dimension keys are dense from 1") {
    val items = TpcdsLite.item(spark, sf).select("i_item_sk").collect().map(_.getLong(0)).sorted
    assert(items.head == 1L && items.last == items.length)
  }

  test("fact foreign keys fall within dimension ranges") {
    val nItems = TpcdsLite.item(spark, sf).count()
    val range = TpcdsLite.storeSales(spark, sf)
      .selectExpr("min(ss_item_sk) AS lo", "max(ss_item_sk) AS hi").head()
    assert(range.getAs[Long]("lo") >= 1L)
    assert(range.getAs[Long]("hi") <= nItems)
  }

  test("generation is deterministic") {
    val a = TpcdsLite.storeSales(spark, sf).selectExpr("sum(ss_quantity) AS s").head().getLong(0)
    val b = TpcdsLite.storeSales(spark, sf).selectExpr("sum(ss_quantity) AS s").head().getLong(0)
    assert(a == b)
  }

  test("monetary columns have exactly two decimals") {
    val bad = TpcdsLite.storeSales(spark, sf)
      .selectExpr("sum(CASE WHEN ss_sales_price != round(ss_sales_price, 2) THEN 1 ELSE 0 END) AS bad")
      .head().getLong(0)
    assert(bad == 0L)
  }

  test("materialize writes parquet once and registers views") {
    val dir = Files.createTempDirectory("tpcds")
    val ts  = TpcdsLite.materialize(spark, sf, dir)
    assert(ts("store_sales").count() == (2880000 * sf).toLong)
    assert(spark.sql("SELECT COUNT(*) AS c FROM store_sales").head().getLong(0) == (2880000 * sf).toLong)
    // Second call must reuse the files (idempotence).
    val before = TpcdsLite.tableBytes(dir, sf, "store_sales")
    TpcdsLite.materialize(spark, sf, dir)
    assert(TpcdsLite.tableBytes(dir, sf, "store_sales") == before)
  }

  test("tableBytes reports positive sizes for materialized tables") {
    val dir = Files.createTempDirectory("tpcds2")
    TpcdsLite.materialize(spark, sf, dir)
    TpcdsLite.tableNames.foreach { t =>
      assert(TpcdsLite.tableBytes(dir, sf, t) > 0L, s"table $t has no bytes")
    }
  }

  test("fact tables are written as multiple files for scan parallelism") {
    val dir = Files.createTempDirectory("tpcds3")
    TpcdsLite.materialize(spark, sf, dir)
    val parts = Files.list(dir.resolve(s"sf$sf").resolve("store_sales"))
      .filter(p => p.getFileName.toString.endsWith(".parquet")).count()
    assert(parts >= 2, s"expected multiple parquet files, got $parts")
  }
}
