package repro.workload

import org.apache.spark.sql.SparkSession
import repro.core.Dag
import repro.exec.{Controller, ExecConfig, NfsModel, RunReport}

/** Execution metadata (§ III-A): per-node output sizes and speedup scores
  * observed from a past (calibration) refresh run, exactly as S/C gathers
  * them from DBMS-side metrics of recurrent pipeline runs.
  */
object Metadata {

  final case class Calibration(report: RunReport, sizes: Map[String, Long]) {
    /** Table III's I/O ratio: time spent reading/writing *intermediate*
      * tables — the share S/C can optimize — over total workload time
      * (base-table reads are unavoidable and stay in the denominator only).
      */
    def ioRatio: Double = {
      val parentReads = report.nodes.map(_.parentReadMs).sum
      val io = parentReads + report.writeForegroundMs + report.writeBackgroundMs
      val total = io + report.nodes.map(_.baseReadMs).sum + report.computeMs
      io / math.max(1e-9, total)
    }
  }

  /** Run the workload once, unoptimized, to observe sizes and times. */
  def calibrate(spark: SparkSession, dataset: Dataset, workload: Workload,
                cfg: ExecConfig): Calibration = {
    val report = new Controller(spark, dataset, cfg).runBaseline(workload)
    Calibration(report, report.sizes)
  }

  /** Speedup scores t_i (§ IV) from calibrated sizes under the NFS model:
    * each child saves a storage read of s_i and the node's own storage
    * write moves off the critical path, minus the cost of creating the node
    * in memory — the paper's `time(create v_i in memory)` term. In this
    * substrate that cost is dominated by the extra Spark action that
    * materializes the cached DataFrame (`memCreateMs`, observed from runs);
    * nodes whose I/O savings do not cover it score 0 and are excluded by
    * SimplifiedMKP's V_exclude rule.
    */
  def speedupScores(workload: Workload, sizes: Map[String, Long], nfs: NfsModel,
                    memCreateMs: Double = 0.0): Map[String, Double] = {
    val sdag = workload.structuralDag
    workload.mvs.zipWithIndex.map { case (mv, i) =>
      val s = sizes(mv.name)
      val saving = sdag.children(i).size * nfs.readMs(s) + nfs.writeMs(s) - memCreateMs
      mv.name -> math.max(0.0, saving)
    }.toMap
  }

  /** The optimizer-facing DAG for a calibrated workload. */
  def dag(workload: Workload, sizes: Map[String, Long], nfs: NfsModel,
          memCreateMs: Double = 0.0): Dag =
    workload.dag(sizes, speedupScores(workload, sizes, nfs, memCreateMs))
}
