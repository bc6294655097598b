package repro.exec

import repro.SparkSpec
import repro.workload.{TestData, Workloads}

class LruBaselineSpec extends SparkSpec {

  private lazy val ds = TestData.regular(spark)
  private val w = Workloads.compute2

  private lazy val sizes: Map[String, Long] = {
    val out = TestData.freshOutDir("lru-cal")
    new Controller(spark, ds, ExecConfig(0L, None, out)).runBaseline(w).sizes
  }

  test("produces the same MV contents as the controller baseline") {
    val calOut = TestData.freshOutDir("lru-base")
    new Controller(spark, ds, ExecConfig(0L, None, calOut)).runBaseline(w, sizes)
    val out = TestData.freshOutDir("lru-run")
    val budget = ds.totalBytes / 2
    new LruBaseline(spark, ds, ExecConfig(budget, Some(NfsModel(1e6, 1e6, 0)), out))
      .run(w, sizes)
    w.mvs.foreach { mv =>
      val a = spark.read.parquet(out.resolve(mv.name).toString).collect().map(_.toString).sorted
      val b = spark.read.parquet(calOut.resolve(mv.name).toString).collect().map(_.toString).sorted
      assert(a.sameElements(b), mv.name)
    }
  }

  test("cache never exceeds the budget") {
    val budget = sizes.values.max + 1
    val out = TestData.freshOutDir("lru-b")
    val r = new LruBaseline(spark, ds, ExecConfig(budget, None, out)).run(w, sizes)
    assert(r.peakBytes(budget))
  }

  test("zero budget caches nothing and still completes") {
    val out = TestData.freshOutDir("lru-z")
    val r = new LruBaseline(spark, ds, ExecConfig(0L, None, out)).run(w, sizes)
    assert(r.peakCatalogBytes == 0)
    assert(r.nodes.size == w.mvs.size)
  }

  test("cache hits reduce modeled read time versus zero cache") {
    val nfs = NfsModel(readBytesPerMs = 50_000, writeBytesPerMs = 25_000, latencyMs = 0.2)
    val zero = new LruBaseline(spark, ds, ExecConfig(0L, Some(nfs), TestData.freshOutDir("lz")))
      .run(w, sizes)
    val cached = new LruBaseline(spark, ds,
      ExecConfig(ds.totalBytes, Some(nfs), TestData.freshOutDir("lc"))).run(w, sizes)
    assert(cached.tableReadMs < zero.tableReadMs)
    // Writes stay on the critical path for LRU — identical totals.
    assert(math.abs(cached.writeForegroundMs - zero.writeForegroundMs) < 1.0)
  }

  private implicit class RichReport(r: RunReport) {
    def peakBytes(budget: Long): Boolean = r.peakCatalogBytes <= budget
  }
}
