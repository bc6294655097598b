package repro.sim

import repro.core.Dag

/** Storage/compute cost model used by the timeline simulator and by the
  * synthetic-workload generator to derive speedup scores (§ IV).
  *
  * Bandwidths are bytes per millisecond; `latencyMs` is the fixed per-access
  * storage latency (the paper's environment: 519.8 MB/s read, 358.9 MB/s
  * write, 175 µs read latency).
  */
final case class CostModel(
    diskReadBytesPerMs: Double,
    diskWriteBytesPerMs: Double,
    memBytesPerMs: Double,
    latencyMs: Double,
) {
  require(diskReadBytesPerMs > 0 && diskWriteBytesPerMs > 0 && memBytesPerMs > 0)

  def diskReadMs(bytes: Long): Double  = latencyMs + bytes / diskReadBytesPerMs
  def diskWriteMs(bytes: Long): Double = latencyMs + bytes / diskWriteBytesPerMs
  def memReadMs(bytes: Long): Double   = bytes / memBytesPerMs
  def memWriteMs(bytes: Long): Double  = bytes / memBytesPerMs

  /** Speedup score t_i (§ IV): per-child read savings plus the create-side
    * saving from materializing in memory and writing to disk off the
    * critical path.
    */
  def speedupScore(dag: Dag, sizes: IndexedSeq[Long], i: Int): Double = {
    val s = sizes(i)
    dag.children(i).size * (diskReadMs(s) - memReadMs(s)) +
      (diskWriteMs(s) - memWriteMs(s))
  }
}

object CostModel {
  /** The paper's measured environment (§ VI-A). */
  val paperEnvironment: CostModel = CostModel(
    diskReadBytesPerMs = 519.8 * 1024 * 1024 / 1000.0,
    diskWriteBytesPerMs = 358.9 * 1024 * 1024 / 1000.0,
    memBytesPerMs = 10.0 * 1024 * 1024 * 1024 / 1000.0, // ~10 GB/s memory
    latencyMs = 0.175,
  )
}
