package repro

/** Smoke tests for the provided TPC-H-lite generators and the DuckDB
  * oracle plumbing itself (the main workload oracle lives in
  * workload.WorkloadOracleSpec).
  */
class SynthDataSpec extends SparkSpec {

  test("lineitem row count scales with sf") {
    assert(SynthData.lineitem(spark, 0.001).count() == 6000)
  }

  test("orders keys are dense from 1") {
    val o = SynthData.orders(spark, 0.001)
    assert(o.count() == 1500)
    import org.apache.spark.sql.functions._
    assert(o.agg(min("o_orderkey")).collect()(0).getLong(0) == 1L)
  }

  test("zipf keys are skewed toward small ranks") {
    import org.apache.spark.sql.functions._
    val z = SynthData.zipfKeys(spark, 10000, 100)
    val top = z.filter(col("k") <= 10).count().toDouble
    assert(top / 10000 > 0.3, s"only ${top / 10000} mass on top-10 keys")
  }

  test("uniform keys cover the range roughly evenly") {
    import org.apache.spark.sql.functions._
    val u = SynthData.uniformKeys(spark, 10000, 10)
    val counts = u.groupBy("k").count().collect().map(_.getLong(1))
    assert(counts.length == 10)
    assert(counts.min > 500 && counts.max < 2000)
  }

  test("oracle accepts a correct aggregate and rejects a wrong one") {
    val li = SynthData.lineitem(spark, 0.001)
    li.createOrReplaceTempView("li_oracle")
    val good = spark.sql(
      "SELECT l_returnflag AS f, COUNT(*) AS cnt FROM li_oracle GROUP BY l_returnflag")
    Oracle.assertEquivalent(good,
      "SELECT l_returnflag AS f, COUNT(*) AS cnt FROM li_oracle GROUP BY l_returnflag",
      "li_oracle" -> li)
    val bad = spark.sql(
      "SELECT l_returnflag AS f, COUNT(*) + 1 AS cnt FROM li_oracle GROUP BY l_returnflag")
    assertThrows[IllegalArgumentException](
      Oracle.assertEquivalent(bad,
        "SELECT l_returnflag AS f, COUNT(*) AS cnt FROM li_oracle GROUP BY l_returnflag",
        "li_oracle" -> li))
  }
}
