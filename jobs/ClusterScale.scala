package repro.jobs

import repro.sim.ClusterSim

/** spark-submit entrypoint for the Table V experiment: scale measured
  * single-node runtimes to a 1–5 worker cluster with the calibrated
  * efficiency-loss model (see ClusterSim).
  *
  * Usage: ClusterScale [noOptSeconds] [scSeconds]
  * (defaults to the paper's single-node measurements for a sanity print)
  */
object ClusterScale {
  def main(args: Array[String]): Unit = {
    val noOpt = args.lift(0).map(_.toDouble).getOrElse(1528.0) * 1000
    val sc    = args.lift(1).map(_.toDouble).getOrElse(934.0) * 1000
    println(f"${"workers"}%8s ${"no-opt(s)"}%10s ${"S/C(s)"}%8s ${"speedup"}%8s")
    ClusterSim.table(noOpt, sc).foreach { r =>
      println(f"${r.nodes}%8d ${r.noOptMs / 1000}%10.1f ${r.scMs / 1000}%8.1f ${r.speedup}%7.2fx")
    }
  }
}
