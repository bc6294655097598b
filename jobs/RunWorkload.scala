package repro.jobs

import java.nio.file.Files
import org.apache.spark.sql.SparkSession
import repro.core.{AlternatingOpt, NodeBaselines, Plan}
import repro.exec.{Controller, ExecConfig, LruBaseline, NfsModel}
import repro.workload.{Metadata, TpcDsLite, Workloads}

/** spark-submit entrypoint: run one workload with one method and print the
  * end-to-end report.
  *
  * Usage: RunWorkload [workloadKey=io1] [method=sc] [sf=0.02] [memPct=1.6] [partitioned=false]
  * Methods: no-opt | greedy | random | ratio | lru | sc
  */
object RunWorkload {
  def main(args: Array[String]): Unit = {
    val wKey   = args.lift(0).getOrElse("io1")
    val method = args.lift(1).getOrElse("sc")
    val sf     = args.lift(2).map(_.toDouble).getOrElse(0.02)
    val memPct = args.lift(3).map(_.toDouble).getOrElse(1.6)
    val part   = args.lift(4).exists(_.toBoolean)

    val spark = SparkSession.builder.appName("sc-run-workload")
      .config("spark.sql.autoBroadcastJoinThreshold", -1).getOrCreate()
    val workload = Workloads.all.find(_.key == wKey)
      .getOrElse(sys.error(s"unknown workload $wKey"))

    val dir = Files.createTempDirectory("screpro")
    val dataset = TpcDsLite.generate(spark, dir.resolve("data"), sf, part)
    val nfs = NfsModel.scaledTo(dataset.totalBytes)
    val budget = (dataset.totalBytes * memPct / 100.0).toLong
    val cfg = ExecConfig(budget, Some(nfs), dir.resolve("mv"))
    val controller = new Controller(spark, dataset, cfg)

    val cal = Metadata.calibrate(spark, dataset, workload, cfg.copy(outDir = dir.resolve("cal")))
    val dag = Metadata.dag(workload, cal.sizes, nfs)

    val report = method match {
      case "no-opt" => controller.runBaseline(workload, cal.sizes)
      case "lru"    => new LruBaseline(spark, dataset, cfg).run(workload, cal.sizes)
      case "sc"     =>
        val r = AlternatingOpt.solve(dag, budget)
        controller.run(workload, r.plan, cal.sizes, "sc")
      case m =>
        val nodes: (repro.core.Dag, Long, Vector[Int]) => Set[Int] = m match {
          case "greedy" => NodeBaselines.greedy
          case "random" => NodeBaselines.random(_, _, _, seed = 7)
          case "ratio"  => NodeBaselines.ratio
          case other    => sys.error(s"unknown method $other")
        }
        controller.run(workload, AlternatingOpt.singleShot(dag, budget, nodes), cal.sizes, m)
    }
    println(f"workload=${report.workload} dataset=${report.dataset} method=${report.method} " +
      f"endToEnd=${report.endToEndMs / 1000}%.2fs read=${report.tableReadMs / 1000}%.2fs " +
      f"compute=${report.computeMs / 1000}%.2fs writeFg=${report.writeForegroundMs / 1000}%.2fs " +
      f"peakCatalog=${report.peakCatalogBytes} budget=$budget")
    spark.stop()
  }
}
