package repro.exec

import java.nio.file.{Files, Path}
import java.util.concurrent.Executors
import scala.collection.mutable
import scala.concurrent.duration.Duration
import scala.concurrent.{Await, ExecutionContext, Future}
import org.apache.spark.sql.SparkSession
import repro.core.Plan
import repro.workload.{Dataset, MvSpec, TpcDsLite, Workload}

/** Execution configuration for one refresh run.
  *
  * @param memoryCatalogBytes Memory Catalog budget M
  * @param nfs                modeled storage costs; None disables delays
  *                           (unit tests) but keeps all real Spark work
  * @param outDir             directory for materialized MV Parquet
  */
final case class ExecConfig(memoryCatalogBytes: Long, nfs: Option[NfsModel], outDir: Path)

/** Per-node measurements from one run. Base-table reads are kept apart from
  * intermediate (parent MV) reads: only the latter are S/C's optimization
  * target and enter the Table III I/O ratio.
  */
final case class NodeReport(name: String, flagged: Boolean, outBytes: Long,
                            baseReadMs: Double, parentReadMs: Double,
                            execMs: Double, writeDelayMs: Double) {
  def readDelayMs: Double = baseReadMs + parentReadMs
}

/** End-to-end measurements from one run (Table IV semantics: the Query
  * latency is TableRead + Compute; foreground writes are reported apart,
  * background writes overlap downstream execution).
  */
final case class RunReport(workload: String, dataset: String, method: String,
                           endToEndMs: Double, tableReadMs: Double, computeMs: Double,
                           writeForegroundMs: Double, writeBackgroundMs: Double,
                           peakCatalogBytes: Long, nodes: Vector[NodeReport]) {
  def queryMs: Double = tableReadMs + computeMs
  def sizes: Map[String, Long] = nodes.map(n => n.name -> n.outBytes).toMap
  def execMsByName: Map[String, Double] = nodes.map(n => n.name -> n.execMs).toMap
}

/** The S/C Controller (§ III-B/C): executes a refresh plan on Spark.
  *
  * Each node's SQL runs over temp views: base tables are Parquet reads of
  * the dataset, parents are either the flagged parent's memory-persisted
  * DataFrame (no storage read) or a Parquet read of the parent's
  * materialized output (modeled storage read). Flagged nodes are created in
  * the Memory Catalog and materialized to storage on a background thread in
  * parallel with downstream execution; unflagged nodes materialize on the
  * critical path. The run ends when all MVs are materialized on storage.
  */
final class Controller(spark: SparkSession, dataset: Dataset, cfg: ExecConfig) {

  private def mvPath(name: String): Path = cfg.outDir.resolve(name)

  private def dirBytes(p: Path): Long = {
    if (!Files.exists(p)) 0L
    else {
      val s = Files.walk(p)
      try s.filter(Files.isRegularFile(_)).mapToLong(Files.size(_)).sum
      finally s.close()
    }
  }

  private def delay(ms: Double): Unit =
    if (ms >= 1.0) Thread.sleep(ms.toLong)

  private def baseReadMs(mv: MvSpec): Double = cfg.nfs.fold(0.0) { m =>
    mv.baseTables.map { t =>
      m.readMs(dataset.effectiveReadBytes(t, mv.partitionYears.get(t)))
    }.sum
  }

  /** Run `workload` under `plan`. `sizes` are the calibrated output sizes
    * (empty on the calibration run itself, where nothing is flagged and
    * sizes are measured from the written Parquet).
    */
  def run(workload: Workload, plan: Plan, sizes: Map[String, Long],
          method: String = "sc"): RunReport = {
    require(plan.order.size == workload.mvs.size, "plan must cover every MV")
    require(plan.flagged.forall(i => sizes.contains(workload.mvs(i).name)),
      "flagged nodes need calibrated sizes")
    Files.createDirectories(cfg.outDir)
    TpcDsLite.registerViews(spark, dataset)

    val catalog = new MemoryCatalog(cfg.memoryCatalogBytes)
    // One materialization channel, as in § III-C / Fig 6: flagged outputs
    // are written to storage one at a time, in parallel with downstream
    // execution (the timeline simulator models the same single channel).
    val writePool = Executors.newFixedThreadPool(1)
    implicit val ec: ExecutionContext = ExecutionContext.fromExecutor(writePool)
    val bgWrites = mutable.Map.empty[String, Future[Double]]
    val released = mutable.Buffer.empty[org.apache.spark.sql.DataFrame]
    val sdag = workload.structuralDag
    val childrenLeft = mutable.Map.empty[Int, Int] ++
      workload.mvs.indices.map(i => i -> sdag.children(i).size)
    val nodeReports = Vector.newBuilder[NodeReport]
    var readTotal, computeTotal, writeFgTotal = 0.0

    val t0 = System.nanoTime()
    try {
      plan.order.foreach { idx =>
        val mv = workload.mvs(idx)
        // Bind parent views: Memory Catalog hit → cached DataFrame, no
        // storage read; miss → Parquet read with modeled NFS delay.
        val baseRead = baseReadMs(mv)
        var parentRead = 0.0
        mv.parents.foreach { p =>
          if (catalog.contains(p)) {
            catalog.dataFrame(p).createOrReplaceTempView(p)
          } else {
            spark.read.parquet(mvPath(p).toString).createOrReplaceTempView(p)
            parentRead += cfg.nfs.fold(0.0)(_.readMs(sizes.getOrElse(p, dirBytes(mvPath(p)))))
          }
        }
        val readDelay = baseRead + parentRead
        delay(readDelay)
        readTotal += readDelay

        val sql = mv.sqlFor(dataset.partitioned)
        val flagged = plan.flagged(idx)
        var writeDelay = 0.0
        var outBytes = 0L
        val tExec0 = System.nanoTime()
        if (flagged) {
          val df = spark.sql(sql)
          catalog.put(mv.name, df, sizes(mv.name)) // create in Memory Catalog
          outBytes = sizes(mv.name)
          val execMs = (System.nanoTime() - tExec0) / 1e6
          computeTotal += execMs
          // Materialize to storage in parallel with downstream execution.
          bgWrites(mv.name) = Future {
            df.write.mode("overwrite").parquet(mvPath(mv.name).toString)
            val w = cfg.nfs.fold(0.0)(_.writeMs(sizes(mv.name)))
            delay(w)
            w
          }
          nodeReports += NodeReport(mv.name, flagged = true, outBytes, baseRead, parentRead, execMs, 0.0)
        } else {
          spark.sql(sql).write.mode("overwrite").parquet(mvPath(mv.name).toString)
          val execMs = (System.nanoTime() - tExec0) / 1e6
          computeTotal += execMs
          outBytes = sizes.getOrElse(mv.name, dirBytes(mvPath(mv.name)))
          writeDelay = cfg.nfs.fold(0.0)(_.writeMs(outBytes))
          delay(writeDelay)
          writeFgTotal += writeDelay
          nodeReports += NodeReport(mv.name, flagged = false, outBytes, baseRead, parentRead, execMs, writeDelay)
        }

        // Release flagged nodes whose last dependent just executed — the
        // node itself when childless (§ III-C: freed as soon as every node
        // depending on it completes; nothing depends on a sink). The
        // physical unpersist waits for the background materialization.
        def releaseFromCatalog(name: String): Unit = {
          val df = catalog.release(name)
          released += df // unpersist is idempotent; finally-block backstop
          bgWrites(name).onComplete(_ => df.unpersist(false))
        }
        if (flagged && sdag.children(idx).isEmpty) releaseFromCatalog(mv.name)
        mv.parents.foreach { p =>
          val pi = workload.index(p)
          childrenLeft(pi) -= 1
          if (childrenLeft(pi) == 0 && catalog.contains(p)) releaseFromCatalog(p)
        }
      }

      // All MVs count as refreshed only once materialized on storage.
      val bgDelays = bgWrites.values.toVector.map(f => Await.result(f, Duration.Inf))
      val endToEnd = (System.nanoTime() - t0) / 1e6
      RunReport(workload.key, dataset.name, method, endToEnd, readTotal, computeTotal,
        writeFgTotal, bgDelays.sum, catalog.peakBytes, nodeReports.result())
    } finally {
      released.foreach(_.unpersist(false))
      catalog.clear()
      writePool.shutdown()
    }
  }

  /** No-optimization baseline: deterministic topological order, no flags. */
  def runBaseline(workload: Workload, sizes: Map[String, Long] = Map.empty): RunReport =
    run(workload, Plan(workload.structuralDag.topological, Set.empty), sizes, method = "no-opt")
}
