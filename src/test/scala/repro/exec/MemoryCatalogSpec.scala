package repro.exec

import repro.SparkSpec

class MemoryCatalogSpec extends SparkSpec {

  private def df(n: Int) = spark.range(n).toDF("v")

  test("put persists, materializes and accounts bytes") {
    val c = new MemoryCatalog(1000)
    val rows = c.put("a", df(10), 400)
    assert(rows == 10)
    assert(c.contains("a") && c.usedBytes == 400 && c.peakBytes == 400)
    c.clear()
  }

  test("budget is enforced on insertion") {
    val c = new MemoryCatalog(1000)
    c.put("a", df(5), 600)
    assertThrows[IllegalArgumentException](c.put("b", df(5), 500))
    c.clear()
  }

  test("release frees accounting and returns the DataFrame") {
    val c = new MemoryCatalog(1000)
    val d = df(5)
    c.put("a", d, 600)
    val got = c.release("a")
    assert(got.collect().length == 5)
    assert(!c.contains("a") && c.usedBytes == 0)
    c.put("b", df(5), 900) // space available again
    assert(c.peakBytes == 900)
    c.clear()
    got.unpersist()
  }

  test("peak tracks the high-water mark across put/release") {
    val c = new MemoryCatalog(1000)
    c.put("a", df(1), 400)
    c.put("b", df(1), 500)
    c.release("a")
    c.put("c", df(1), 300)
    assert(c.usedBytes == 800)
    assert(c.peakBytes == 900)
    c.clear()
  }

  test("duplicate put is rejected") {
    val c = new MemoryCatalog(1000)
    c.put("a", df(1), 10)
    assertThrows[IllegalArgumentException](c.put("a", df(1), 10))
    c.clear()
  }

  test("release of a missing entry is rejected") {
    val c = new MemoryCatalog(1000)
    assertThrows[NoSuchElementException](c.release("zzz"))
  }

  test("cached reads come from the in-memory relation") {
    val c = new MemoryCatalog(1000)
    val d = df(100)
    c.put("a", d, 10)
    assert(d.queryExecution.executedPlan.toString.contains("InMemory") ||
      d.storageLevel.useMemory)
    c.clear()
  }

  test("clear empties everything") {
    val c = new MemoryCatalog(1000)
    c.put("a", df(1), 10)
    c.put("b", df(1), 10)
    c.clear()
    assert(c.usedBytes == 0 && !c.contains("a") && !c.contains("b"))
  }
}
