package repro.core

/** Algorithm 1 — SimplifiedMKP: the exact solution to S/C Opt Nodes.
  *
  * Given an execution order τ it (1) excludes oversized / zero-score nodes,
  * (2) builds the maximal non-trivial alive-set constraints, (3) solves the
  * resulting 0-1 MKP exactly, and (4) trivially flags every non-excluded
  * node that appears in no kept constraint set (flagging those can never
  * violate the budget — every coexistence instant is covered by some
  * alive-set, and all sets containing only such nodes are trivial).
  */
object SimplifiedMkp {

  /** Flagged set U maximizing Σ t_i feasibly under `order` and the budget. */
  def solve(dag: Dag, memoryBudget: Long, order: Vector[Int]): Set[Int] = {
    require(dag.isTopological(order), "SimplifiedMKP requires a topological order")
    val exclude = Constraints.excluded(dag, memoryBudget)
    val sets    = Constraints.constraintSets(dag, order, memoryBudget)

    val vMkp = sets.flatten.distinct.sorted // nodes that appear in any kept set
    val idx  = vMkp.zipWithIndex.toMap

    val profits = vMkp.map(dag.speedup).toVector
    val weights = sets.map { s =>
      vMkp.map(j => if (s(j)) dag.size(j) else 0L).toVector
    }
    val capacities = Vector.fill(sets.size)(memoryBudget)

    val chosen = MkpSolver.solve(profits, weights, capacities).map(vMkp(_))

    // Algorithm 1 line 9: nodes outside every kept constraint set and not
    // excluded are flagged for free.
    val free = (0 until dag.n).filter(i => !idx.contains(i) && !exclude(i)).toSet
    chosen ++ free
  }
}
