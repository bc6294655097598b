package repro.core

import scala.util.Random

/** Baseline flag-selection methods for S/C Opt Nodes (§ VI-A).
  *
  * Each iterates over candidate nodes in some priority order and flags a
  * node iff doing so keeps the plan feasible (peak Memory-Catalog usage ≤
  * budget under the given execution order).
  */
object NodeBaselines {

  private def selectBy(dag: Dag, memoryBudget: Long, order: Vector[Int],
                       visit: Seq[Int]): Set[Int] = {
    var flagged = Set.empty[Int]
    visit.foreach { i =>
      if (dag.size(i) <= memoryBudget && dag.speedup(i) > 0) {
        val cand = flagged + i
        if (Plan.peakMemoryUsage(dag, Plan(order, cand)) <= memoryBudget)
          flagged = cand
      }
    }
    flagged
  }

  /** Greedy: visit nodes in execution order; flag when it still fits. */
  def greedy(dag: Dag, memoryBudget: Long, order: Vector[Int]): Set[Int] =
    selectBy(dag, memoryBudget, order, order)

  /** Random: visit nodes in random order; flag when it still fits. */
  def random(dag: Dag, memoryBudget: Long, order: Vector[Int], seed: Long): Set[Int] =
    selectBy(dag, memoryBudget, order, new Random(seed).shuffle((0 until dag.n).toList))

  /** Ratio-based selection [Xin et al.]: highest speedup/size ratio first. */
  def ratio(dag: Dag, memoryBudget: Long, order: Vector[Int]): Set[Int] =
    selectBy(dag, memoryBudget, order,
      (0 until dag.n).sortBy(i => -dag.speedup(i) / math.max(1L, dag.size(i)).toDouble))
}
