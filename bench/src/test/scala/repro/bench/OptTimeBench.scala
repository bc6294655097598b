package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.core.{AlternatingOpt, NodeBaselines, OrderBaselines}
import repro.workload.DagGen

/** Fig 13 — optimization wall time of each S/C Opt method pair on generated
  * DAGs of 25–100 nodes (paper: MKP + MA-DFS stays ~linear and ≤ ~0.02 s at
  * 100 nodes with OR-Tools; our pure-Scala solver gets the same shape).
  */
class OptTimeBench extends AnyFunSuite {

  private val sizes = Vector(25, 50, 75, 100)
  private val dagsPerSize = sys.env.get("REPRO_BENCH_DAGS").map(_.toInt).getOrElse(50)
  private val budget = 16L << 30 // 16 GB catalog against 100 GB-scale tables

  private val methods: Vector[(String, AlternatingOpt.Solvers)] = Vector(
    "MKP+MA-DFS"    -> AlternatingOpt.scSolvers,
    "Greedy+MA-DFS" -> AlternatingOpt.scSolvers.copy(nodes = NodeBaselines.greedy),
    "Random+MA-DFS" -> AlternatingOpt.scSolvers.copy(nodes = NodeBaselines.random(_, _, _, 7)),
    "Ratio+MA-DFS"  -> AlternatingOpt.scSolvers.copy(nodes = NodeBaselines.ratio),
    "MKP+SA"        -> AlternatingOpt.scSolvers.copy(order = (d, u) =>
      OrderBaselines.simulatedAnnealing(d, u, d.topological, iterations = 10000)),
    "MKP+Separator" -> AlternatingOpt.scSolvers.copy(order = OrderBaselines.separator),
  )

  test("Fig 13: optimization time vs DAG size for all method pairs") {
    // Warm up JIT so the first measured cell is not inflated.
    (0 until 5).foreach { s =>
      AlternatingOpt.solve(DagGen.generate(DagGen.Params(50, seed = 1000 + s)).dag, budget)
    }
    val table = sizes.map { n =>
      val dags = (0 until dagsPerSize).map(s =>
        DagGen.generate(DagGen.Params(n, seed = s)).dag)
      n -> methods.map { case (label, solvers) =>
        val t0 = System.nanoTime()
        dags.foreach(d => AlternatingOpt.solve(d, budget, solvers))
        label -> (System.nanoTime() - t0) / 1e6 / dags.size
      }
    }
    val sb = new StringBuilder
    sb ++= f"Mean optimization time per DAG (ms), $dagsPerSize DAGs per size\n"
    sb ++= f"${"nodes"}%6s" + methods.map(m => f"${m._1}%15s").mkString + "\n"
    table.foreach { case (n, row) =>
      sb ++= f"$n%6d" + row.map { case (_, ms) => f"$ms%14.2f " }.mkString + "\n"
    }
    BenchData.record("fig13_opt_time.txt", sb.toString)

    val at100 = table.last._2.toMap
    // S/C's optimizer is fast in absolute terms (paper: 0.02 s with
    // OR-Tools; allow generous slack for the pure-Scala solver).
    assert(at100("MKP+MA-DFS") < 500.0,
      f"optimizer too slow at 100 nodes: ${at100("MKP+MA-DFS")}%.1f ms")
    // SA at the paper's 10k iterations is significantly slower (Fig 13).
    assert(at100("MKP+SA") > at100("MKP+MA-DFS"))
    // Rough linear scaling: 4x the nodes should not cost 40x the time.
    val at25 = table.head._2.toMap
    assert(at100("MKP+MA-DFS") < math.max(1.0, at25("MKP+MA-DFS")) * 40)
  }
}
