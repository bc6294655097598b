package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.workload.Workloads

/** Fig 9 — end-to-end MV refresh time per workload for S/C versus the
  * unoptimized engine and the off-the-shelf baselines (Greedy, Random,
  * Ratio-based selection, DBMS LRU cache), with the paper's Memory Catalog
  * setting of 1.6% of the dataset (0.8% for the date-partitioned variant).
  */
class EndToEndBench extends AnyFunSuite {

  private val methods = Vector("no-opt", "greedy", "random", "ratio", "lru", "sc")

  test("Fig 9a: TPC-DS end-to-end runtimes, 1.6% Memory Catalog") {
    val ds = BenchData.regular
    val pct = 1.6
    val sb = new StringBuilder
    sb ++= f"${"Workload"}%-10s" + methods.map(m => f"$m%10s").mkString + f"${"S/C speedup"}%13s\n"
    val perMethodTotals = scala.collection.mutable.Map.empty[String, Double].withDefaultValue(0.0)
    Workloads.all.foreach { w =>
      val times = methods.map(m => m -> BenchData.run(ds, w, m, pct).endToEndMs).toMap
      methods.foreach(m => perMethodTotals(m) += times(m))
      sb ++= f"${w.title}%-10s" +
        methods.map(m => f"${times(m) / 1000}%9.1fs").mkString +
        f"${times("no-opt") / times("sc")}%12.2fx\n"
    }
    sb ++= f"${"TOTAL"}%-10s" + methods.map(m => f"${perMethodTotals(m) / 1000}%9.1fs").mkString +
      f"${perMethodTotals("no-opt") / perMethodTotals("sc")}%12.2fx\n"
    BenchData.record("fig9a_tpcds.txt", sb.toString)

    // Shape claims: S/C beats no-opt overall, and no baseline beats S/C by
    // more than measurement noise.
    assert(perMethodTotals("sc") < perMethodTotals("no-opt"),
      "S/C total not below the unoptimized total")
    methods.filterNot(_ == "sc").foreach { m =>
      assert(perMethodTotals("sc") <= perMethodTotals(m) * 1.05,
        f"S/C ${perMethodTotals("sc") / 1000}%.1fs worse than $m ${perMethodTotals(m) / 1000}%.1fs")
    }
    // The I/O workloads individually benefit.
    Seq(Workloads.io1, Workloads.io2, Workloads.io3).foreach { w =>
      val no = BenchData.run(ds, w, "no-opt", pct).endToEndMs
      val sc = BenchData.run(ds, w, "sc", pct).endToEndMs
      assert(sc < no, s"${w.key}: S/C $sc not below no-opt $no")
    }
  }

  test("Fig 9b: TPC-DSp end-to-end runtimes, 0.8% Memory Catalog") {
    val ds = BenchData.partitioned
    val pct = 0.8
    val sb = new StringBuilder
    sb ++= f"${"Workload"}%-10s${"no-opt"}%10s${"sc"}%10s${"speedup"}%10s\n"
    var no, sc = 0.0
    Workloads.all.foreach { w =>
      val n = BenchData.run(ds, w, "no-opt", pct).endToEndMs
      val s = BenchData.run(ds, w, "sc", pct).endToEndMs
      no += n; sc += s
      sb ++= f"${w.title}%-10s${n / 1000}%9.1fs${s / 1000}%9.1fs${n / s}%9.2fx\n"
    }
    sb ++= f"${"TOTAL"}%-10s${no / 1000}%9.1fs${sc / 1000}%9.1fs${no / sc}%9.2fx\n"
    BenchData.record("fig9b_tpcdsp.txt", sb.toString)
    assert(sc < no, "S/C total not below no-opt on TPC-DSp")
  }

  test("TPC-DSp achieves at least the TPC-DS relative speedup (paper § VI-B)") {
    val dsSpeedup = BenchData.total(BenchData.regular, "no-opt", 1.6)(_.endToEndMs) /
      BenchData.total(BenchData.regular, "sc", 1.6)(_.endToEndMs)
    val dspSpeedup = BenchData.total(BenchData.partitioned, "no-opt", 0.8)(_.endToEndMs) /
      BenchData.total(BenchData.partitioned, "sc", 0.8)(_.endToEndMs)
    // Smaller intermediates let S/C keep more in memory: the partitioned
    // dataset should not do worse despite half the catalog.
    assert(dspSpeedup >= dsSpeedup * 0.9,
      f"TPC-DSp speedup $dspSpeedup%.2f far below TPC-DS $dsSpeedup%.2f")
  }
}
