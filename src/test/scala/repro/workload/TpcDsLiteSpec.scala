package repro.workload

import repro.SparkSpec

class TpcDsLiteSpec extends SparkSpec {

  lazy val ds = TestData.regular(spark)
  lazy val dsp = TestData.partitioned(spark)

  test("all tables exist with bytes on disk") {
    TpcDsLite.AllTables.foreach { t =>
      assert(ds.tableBytes(t) > 0, s"$t empty")
    }
  }

  test("row counts scale with the scale factor") {
    val small = TpcDsLite.storeSales(spark, 0.001).count()
    val large = TpcDsLite.storeSales(spark, 0.002).count()
    assert(large == 2 * small)
  }

  test("date_dim spans 1998-2002 with one row per day") {
    val dd = TpcDsLite.dateDim(spark)
    assert(dd.count() == TpcDsLite.NDays)
    val years = dd.select("d_year").distinct().collect().map(_.getInt(0)).sorted
    assert(years.toSeq == (1998 to 2002))
  }

  test("date_dim months and quarters are consistent") {
    import org.apache.spark.sql.functions._
    val dd = TpcDsLite.dateDim(spark)
    assert(dd.filter(col("d_qoy") =!= floor((col("d_moy") + 2) / 3)).count() == 0)
  }

  test("generators are deterministic") {
    val a = TpcDsLite.storeSales(spark, 0.001).collect().map(_.toString).sorted
    val b = TpcDsLite.storeSales(spark, 0.001).collect().map(_.toString).sorted
    assert(a.sameElements(b))
  }

  test("sales foreign keys land in dimension ranges") {
    import org.apache.spark.sql.functions._
    val ss = TpcDsLite.storeSales(spark, TestData.SF)
    val nItems = TpcDsLite.item(spark, TestData.SF).count()
    val bad = ss.filter(col("ss_item_sk") < 1 || col("ss_item_sk") > nItems)
      .union(ss.filter(col("ss_sold_date_sk") < 1 || col("ss_sold_date_sk") > TpcDsLite.NDays))
    assert(bad.count() == 0)
  }

  test("partitioned dataset has per-year partitions for every sales table") {
    TpcDsLite.SalesTables.foreach { t =>
      val parts = dsp.partitionBytes(t)
      assert(parts.keySet == (1998 to 2002).toSet, s"$t partitions: ${parts.keySet}")
      assert(parts.values.forall(_ > 0), s"$t has an empty partition")
    }
  }

  test("effectiveReadBytes prunes partitions only on the partitioned dataset") {
    val full = ds.effectiveReadBytes("store_sales", Some(Seq(2000)))
    assert(full == ds.tableBytes("store_sales"))
    val pruned = dsp.effectiveReadBytes("store_sales", Some(Seq(2000)))
    assert(pruned == dsp.partitionBytes("store_sales")(2000))
    assert(pruned < dsp.tableBytes("store_sales"))
  }

  test("partitioned sales rows equal regular sales rows") {
    val reg = spark.read.parquet(ds.tablePath("web_sales")).count()
    val part = spark.read.parquet(dsp.tablePath("web_sales")).count()
    assert(reg == part)
  }

  test("partition year column matches the date dimension") {
    val ws = spark.read.parquet(dsp.tablePath("web_sales"))
    ws.createOrReplaceTempView("ws_check")
    TpcDsLite.dateDim(spark).createOrReplaceTempView("dd_check")
    val bad = spark.sql(
      """SELECT COUNT(*) AS c FROM ws_check JOIN dd_check ON ws_sold_date_sk = d_date_sk
        |WHERE ws_sold_year <> d_year""".stripMargin).collect()(0).getLong(0)
    assert(bad == 0)
  }

  test("unknown table name is rejected") {
    assertThrows[IllegalArgumentException](TpcDsLite.table(spark, "nope", 0.01))
  }

  test("registerViews exposes every base table to SQL") {
    TpcDsLite.registerViews(spark, ds)
    TpcDsLite.AllTables.foreach { t =>
      assert(spark.sql(s"SELECT * FROM $t LIMIT 1").collect().nonEmpty, s"$t view empty")
    }
  }
}
