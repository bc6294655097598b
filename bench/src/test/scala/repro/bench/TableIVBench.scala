package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.workload.Dataset

/** Table IV — effect of the Memory Catalog size on table-read, compute and
  * query latency (summed over the five workloads) for both datasets.
  * As in the paper, Query = TableRead + Compute; writes overlap downstream
  * work when flagged and are reported separately.
  */
class TableIVBench extends AnyFunSuite {

  private val pcts = Vector(0.4, 0.8, 1.6, 3.2, 6.4)

  private val paper = Map(
    // dataset -> (row label -> (no-opt, 0.4, 0.8, 1.6, 3.2, 6.4))
    "TPC-DS" -> Map(
      "Table read" -> Vector(4243, 4308, 3934, 3574, 3128, 2884),
      "Compute"    -> Vector(8533, 8587, 8319, 8283, 8249, 8286),
      "Query"      -> Vector(12776, 12895, 12253, 11857, 11377, 11170)),
    "TPC-DSp" -> Map(
      "Table read" -> Vector(1710, 1514, 1314, 1106, 1106, 1096),
      "Compute"    -> Vector(2843, 2756, 2709, 2657, 2636, 2644),
      "Query"      -> Vector(4553, 4270, 4023, 3763, 3742, 3740)),
  )

  private def sweep(ds: Dataset): Map[String, Vector[Double]] = {
    def totals(method: String, pct: Double): (Double, Double) =
      (BenchData.total(ds, method, pct)(_.tableReadMs),
        BenchData.total(ds, method, pct)(_.computeMs))
    val noOpt = totals("no-opt", 0.0)
    val sc = pcts.map(p => totals("sc", p))
    Map(
      "Table read" -> (noOpt._1 +: sc.map(_._1)),
      "Compute"    -> (noOpt._2 +: sc.map(_._2)),
      "Query"      -> ((noOpt._1 + noOpt._2) +: sc.map(t => t._1 + t._2)),
    )
  }

  private def render(ds: Dataset, rows: Map[String, Vector[Double]]): String = {
    val sb = new StringBuilder
    sb ++= f"${ds.name}: latency (s) vs Memory Catalog size\n"
    sb ++= f"${"Metric"}%-12s${"No opt"}%9s" + pcts.map(p => f"$p%8.1f%%").mkString + "\n"
    Seq("Table read", "Compute", "Query").foreach { k =>
      sb ++= f"$k%-12s" + rows(k).map(v => f"${v / 1000}%8.1fs").mkString(" ") + "\n"
      sb ++= f"${"  (paper)"}%-12s" + paper(ds.name)(k).map(v => f"${v}%8ds").mkString(" ") + "\n"
    }
    sb.toString
  }

  private def checkShape(name: String, rows: Map[String, Vector[Double]]): Unit = {
    val read = rows("Table read")
    // Larger catalogs must not increase read latency materially, and the
    // largest catalog must clearly beat no-opt (paper: 1.42–1.51×).
    assert(read.last < read.head, s"$name: read ${read.last} not below no-opt ${read.head}")
    pcts.indices.dropRight(1).foreach { i =>
      assert(read(i + 2) <= read(i + 1) * 1.15,
        s"$name: read regressed between ${pcts(i)}% and ${pcts(i + 1)}%")
    }
    // Compute latency is not the optimization target: roughly flat.
    val comp = rows("Compute")
    assert(comp.last > comp.head * 0.5 && comp.last < comp.head * 1.5,
      s"$name: compute changed drastically (${comp.head} -> ${comp.last})")
  }

  test("Table IV: TPC-DS latency breakdown vs Memory Catalog size") {
    val rows = sweep(BenchData.regular)
    BenchData.record("table4_tpcds.txt", render(BenchData.regular, rows))
    checkShape("TPC-DS", rows)
  }

  test("Table IV: TPC-DSp latency breakdown vs Memory Catalog size") {
    val rows = sweep(BenchData.partitioned)
    BenchData.record("table4_tpcdsp.txt", render(BenchData.partitioned, rows))
    checkShape("TPC-DSp", rows)
  }
}
