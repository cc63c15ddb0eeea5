package repro

/** Sanity + oracle coverage for the provided TPC-H-lite generators
  * (`SynthData`). The AutoExecutor reproduction evaluates on the TPC-DS-lite
  * extension (`repro.tpcds.TpcdsLite`), but the base generators stay
  * exercised so both schema families remain usable.
  */
class SynthDataSpec extends SparkSpec {
  private val sf = 0.001

  test("lineitem scales with sf and has sane value ranges") {
    val li = SynthData.lineitem(spark, sf).cache()
    assert(li.count() == (6000000 * sf).toLong)
    val r = li.selectExpr(
      "min(l_quantity) AS minq", "max(l_quantity) AS maxq",
      "min(l_discount) AS mind", "max(l_discount) AS maxd").head()
    assert(r.getAs[Double]("minq") >= 1.0 && r.getAs[Double]("maxq") <= 51.0)
    assert(r.getAs[Double]("mind") >= 0.0 && r.getAs[Double]("maxd") <= 0.10)
  }

  test("orders keys are dense and foreign keys in range") {
    val o = SynthData.orders(spark, sf).cache()
    val nCust = SynthData.customer(spark, sf).count()
    assert(o.count() == (1500000 * sf).toLong)
    val r = o.selectExpr("min(o_custkey) AS lo", "max(o_custkey) AS hi").head()
    assert(r.getAs[Long]("lo") >= 1L && r.getAs[Long]("hi") <= nCust)
  }

  test("generators are deterministic in (sf, seed)") {
    val a = SynthData.lineitem(spark, sf).selectExpr("sum(l_orderkey) AS s").head().getLong(0)
    val b = SynthData.lineitem(spark, sf).selectExpr("sum(l_orderkey) AS s").head().getLong(0)
    assert(a == b)
  }

  test("zipf keys are skewed, uniform keys are not") {
    def topShare(df: org.apache.spark.sql.DataFrame): Double = {
      val total = df.count().toDouble
      val top   = df.groupBy("k").count().orderBy(org.apache.spark.sql.functions.desc("count"))
        .limit(1).head().getLong(1).toDouble
      top / total
    }
    val zipf = topShare(SynthData.zipfKeys(spark, rows = 20000, nKeys = 1000))
    val unif = topShare(SynthData.uniformKeys(spark, rows = 20000, nKeys = 1000))
    assert(zipf > 5 * unif, s"zipf top-key share $zipf should dwarf uniform $unif")
  }

  test("TPC-H-lite pricing query matches DuckDB") {
    val li = SynthData.lineitem(spark, sf)
    li.createOrReplaceTempView("lineitem")
    val sql = """
      SELECT l_returnflag, l_linestatus,
             SUM(CAST(l_quantity AS DECIMAL(12,2))) AS sum_qty,
             SUM(CAST(l_extendedprice AS DECIMAL(12,2))) AS sum_price,
             CAST(COUNT(*) AS BIGINT) AS cnt
      FROM lineitem
      WHERE CAST(l_shipdate AS DATE) <= DATE '1998-09-01'
      GROUP BY l_returnflag, l_linestatus
    """
    Oracle.assertEquivalent(spark.sql(sql), sql, "lineitem" -> li)
  }

  test("TPC-H-lite join query matches DuckDB") {
    val o = SynthData.orders(spark, sf); val c = SynthData.customer(spark, sf)
    o.createOrReplaceTempView("orders"); c.createOrReplaceTempView("customer")
    val sql = """
      SELECT c_mktsegment, CAST(COUNT(*) AS BIGINT) AS orders_cnt,
             SUM(CAST(o_totalprice AS DECIMAL(14,2))) AS revenue
      FROM orders JOIN customer ON o_custkey = c_custkey
      WHERE CAST(c_acctbal AS DOUBLE) > 0.0
      GROUP BY c_mktsegment
    """
    Oracle.assertEquivalent(spark.sql(sql), sql, "orders" -> o, "customer" -> c)
  }
}
