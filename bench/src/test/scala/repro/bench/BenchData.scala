package repro.bench

import java.nio.file.{Files, Path, Paths}
import scala.collection.mutable
import org.apache.spark.sql.SparkSession
import repro.SparkSpec
import repro.core.{AlternatingOpt, Dag, NodeBaselines, Plan}
import repro.exec.{Controller, ExecConfig, LruBaseline, NfsModel, RunReport}
import repro.sim.Simulator
import repro.workload.{Dataset, Metadata, TpcDsLite, Workload, Workloads}

/** Shared benchmark fixture: one generated TPC-DS-lite dataset pair per
  * bench JVM, per-workload calibrations (which double as the unoptimized
  * baseline measurements), and memoized method runs so Table IV, Table V
  * and the Fig 9 comparison reuse the same executions.
  *
  * Knobs (env): REPRO_BENCH_SF (default 0.01), REPRO_BENCH_IO_SECONDS
  * (full-dataset scan cost of the modeled NFS, default 8 s).
  */
object BenchData {
  val sf: Double = sys.env.get("REPRO_BENCH_SF").map(_.toDouble).getOrElse(0.01)
  val fullReadSeconds: Double =
    sys.env.get("REPRO_BENCH_IO_SECONDS").map(_.toDouble).getOrElse(8.0)

  /** Memory-regime mapping (documented in DESIGN.md/EXPERIMENTS.md): real
    * TPC-DS tables are 23+ columns wide and the paper's queries highly
    * selective, so the paper's SPJ intermediates are ~0.05–1 % of dataset
    * bytes and a 0.4–6.4 % Memory Catalog holds many of them. TPC-DS-lite
    * tables are narrow, so our intermediates are ~8× larger relative to the
    * dataset; catalog budgets are scaled by the same factor to land in the
    * paper's catalog:intermediate regime. All tables report the paper-side
    * percentage labels.
    */
  val regimeFactor: Double =
    sys.env.get("REPRO_BENCH_REGIME_FACTOR").map(_.toDouble).getOrElse(8.0)

  lazy val spark: SparkSession = SparkSpec.shared
  lazy val dir: Path = Files.createTempDirectory("sc-bench")
  lazy val resultsDir: Path = {
    val p = Paths.get(sys.env.getOrElse("REPRO_RESULTS_DIR", "/root/repo/results"))
    Files.createDirectories(p); p
  }

  lazy val regular: Dataset = TpcDsLite.generate(spark, dir.resolve("reg"), sf, partitioned = false)
  lazy val partitioned: Dataset = TpcDsLite.generate(spark, dir.resolve("part"), sf, partitioned = true)

  def nfs(ds: Dataset): NfsModel = NfsModel.scaledTo(ds.totalBytes, fullReadSeconds)

  /** Memory Catalog bytes for a paper-side percentage label. */
  def budget(ds: Dataset, paperPct: Double): Long =
    (ds.totalBytes * paperPct * regimeFactor / 100.0).toLong

  private val calCache = mutable.Map.empty[(String, String), Metadata.Calibration]

  /** Calibration = the unoptimized (no-opt) run with modeled NFS delays. */
  def calibration(ds: Dataset, w: Workload): Metadata.Calibration = synchronized {
    calCache.getOrElseUpdate((ds.name, w.key), {
      val out = Files.createTempDirectory(dir, s"cal-${ds.name}-${w.key}")
      Metadata.calibrate(spark, ds, w, ExecConfig(0L, Some(nfs(ds)), out))
    })
  }

  /** Observed cost of creating a node in the Memory Catalog (the extra
    * Spark action materializing the cache); enters the speedup score as the
    * paper's `time(create v_i in memory)` term.
    */
  val memCreateMs: Double =
    sys.env.get("REPRO_BENCH_MEM_CREATE_MS").map(_.toDouble).getOrElse(400.0)

  def dag(ds: Dataset, w: Workload): Dag =
    Metadata.dag(w, calibration(ds, w).sizes, nfs(ds), memCreateMs)

  /** Plan for a method under a Memory Catalog of `pct`% of the dataset. */
  def plan(ds: Dataset, w: Workload, method: String, pct: Double): Plan = {
    val d = dag(ds, w)
    val m = budget(ds, pct)
    method match {
      case "no-opt" => Plan(d.topological, Set.empty)
      case "sc"     => AlternatingOpt.solve(d, m).plan
      case "greedy" => AlternatingOpt.singleShot(d, m, NodeBaselines.greedy)
      case "random" => AlternatingOpt.singleShot(d, m, NodeBaselines.random(_, _, _, seed = 7))
      case "ratio"  => AlternatingOpt.singleShot(d, m, NodeBaselines.ratio)
      case other    => sys.error(s"unknown method $other")
    }
  }

  private val runCache = mutable.Map.empty[(String, String, String, Double), RunReport]

  /** Execute (memoized) one workload with one method at `pct`% catalog. */
  def run(ds: Dataset, w: Workload, method: String, pct: Double): RunReport = synchronized {
    runCache.getOrElseUpdate((ds.name, w.key, method, pct), {
      val cal = calibration(ds, w)
      if (method == "no-opt") cal.report
      else {
        val out = Files.createTempDirectory(dir, s"run-${ds.name}-${w.key}-$method-$pct")
        val cfg = ExecConfig(budget(ds, pct), Some(nfs(ds)), out)
        if (method == "lru") new LruBaseline(spark, ds, cfg).run(w, cal.sizes)
        else new Controller(spark, ds, cfg).run(w, plan(ds, w, method, pct), cal.sizes, method)
      }
    })
  }

  /** Sum of a metric over all five workloads for a method/pct. */
  def total(ds: Dataset, method: String, pct: Double)(metric: RunReport => Double): Double =
    Workloads.all.map(w => metric(run(ds, w, method, pct))).sum

  /** Simulator inputs derived from a workload's calibration. */
  def simInputs(ds: Dataset, w: Workload): Simulator.Inputs = {
    val cal = calibration(ds, w)
    Simulator.Inputs(
      sizes = w.mvs.map(m => cal.sizes(m.name)).toVector,
      computeMs = w.mvs.map(m => cal.report.execMsByName(m.name)).toVector,
      baseReadBytes = w.mvs.map(m =>
        m.baseTables.map(t => ds.effectiveReadBytes(t, m.partitionYears.get(t))).sum).toVector,
      memCreateMs = memCreateMs,
    )
  }

  /** Persist a table artifact under results/ and echo it to the test log. */
  def record(name: String, content: String): Unit = {
    Files.write(resultsDir.resolve(name), content.getBytes("UTF-8"))
    println(s"\n===== $name =====\n$content")
  }
}
