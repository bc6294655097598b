package repro.core

/** Exhaustive-search oracles for small instances, used to verify the exact
  * solvers and to bound the heuristics.
  */
object BruteForce {

  /** Optimal MKP value by enumerating all 2^l selections. */
  def mkpValue(profits: Vector[Double], weights: Vector[Vector[Long]],
               capacities: Vector[Long]): Double = {
    val l = profits.size
    require(l <= 20, "brute force only for small instances")
    (0 until (1 << l)).map { mask =>
      val sel = (0 until l).filter(y => (mask & (1 << y)) != 0)
      val ok = weights.indices.forall(x => sel.map(weights(x)(_)).sum <= capacities(x))
      if (ok) sel.map(profits(_)).sum else -1.0
    }.max
  }

  /** Optimal flagged-set value for a fixed order, by subset enumeration
    * against the true peak-memory feasibility check.
    */
  def bestFlagsForOrder(dag: Dag, budget: Long, order: Vector[Int]): Double = {
    require(dag.n <= 16)
    (0 until (1 << dag.n)).map { mask =>
      val flags = (0 until dag.n).filter(i => (mask & (1 << i)) != 0).toSet
      if (Plan.peakMemoryUsage(dag, Plan(order, flags)) <= budget)
        flags.toSeq.map(dag.speedup).sum
      else -1.0
    }.max
  }

  /** All topological orders of a (tiny) DAG. */
  def allTopoOrders(dag: Dag): Seq[Vector[Int]] = {
    def rec(remaining: Set[Int], indeg: Map[Int, Int]): Seq[Vector[Int]] = {
      if (remaining.isEmpty) Seq(Vector.empty)
      else remaining.toSeq.filter(indeg(_) == 0).flatMap { v =>
        val indeg2 = dag.children(v).foldLeft(indeg)((m, c) => m.updated(c, m(c) - 1))
        rec(remaining - v, indeg2).map(v +: _)
      }
    }
    rec((0 until dag.n).toSet, (0 until dag.n).map(i => i -> dag.parents(i).size).toMap)
  }

  /** Global optimum of S/C Opt over all (order, flag-set) pairs. */
  def optimum(dag: Dag, budget: Long): Double =
    allTopoOrders(dag).map(bestFlagsForOrder(dag, budget, _)).max

  /** Deterministic random DAG for property-style tests. */
  def randomDag(n: Int, seed: Long, maxSize: Long = 100): Dag = {
    val rnd = new scala.util.Random(seed)
    val edges = (for {
      c <- 1 until n
      p <- 0 until c
      if rnd.nextDouble() < 0.3
    } yield (p, c)).toSet
    val sizes = Vector.fill(n)(1L + rnd.nextInt(maxSize.toInt))
    val speedups = Vector.fill(n)(rnd.nextInt(50).toDouble)
    Dag.of(sizes, speedups, edges)
  }
}
