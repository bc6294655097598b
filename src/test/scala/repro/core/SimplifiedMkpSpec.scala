package repro.core

import org.scalatest.funsuite.AnyFunSuite

class SimplifiedMkpSpec extends AnyFunSuite {

  private val dag = Dag.of(
    sizes = Seq(100, 5, 100, 5, 10, 10), speedups = Seq(100, 5, 100, 5, 10, 10),
    edges = Set((0, 1), (0, 3), (2, 4), (4, 5)))
  private val idOrder = Vector(0, 1, 2, 3, 4, 5)

  test("returns a feasible flag set") {
    val u = SimplifiedMkp.solve(dag, 100, idOrder)
    assert(Plan.peakMemoryUsage(dag, Plan(idOrder, u)) <= 100)
  }

  test("optimal under the id order (Fig 7 τ1: 120)") {
    val u = SimplifiedMkp.solve(dag, 100, idOrder)
    assert(u.toSeq.map(dag.speedup).sum == 120.0) // v0 + v4 + v5
    assert(u == Set(0, 4, 5))
  }

  test("optimal under the reordered τ2 (Fig 7: 210)") {
    val tau2 = Vector(0, 1, 3, 2, 4, 5)
    val u = SimplifiedMkp.solve(dag, 100, tau2)
    assert(u.toSeq.map(dag.speedup).sum == 210.0) // v0 + v2 + v5
    assert(Plan.peakMemoryUsage(dag, Plan(tau2, u)) <= 100)
  }

  test("oversized nodes are never flagged") {
    val u = SimplifiedMkp.solve(dag, 50, idOrder)
    assert(!u.contains(0) && !u.contains(2))
  }

  test("zero-speedup nodes are never flagged") {
    val d = Dag.of(Seq(1, 1, 1), Seq(0.0, 5.0, 5.0), Set((0, 1), (1, 2)))
    val u = SimplifiedMkp.solve(d, 100, d.topological)
    assert(!u.contains(0))
  }

  test("unconstrained nodes are trivially flagged (line 9)") {
    // Budget large enough that all alive-sets are trivial → everything with
    // positive speedup gets flagged for free.
    val u = SimplifiedMkp.solve(dag, 1000, idOrder)
    assert(u == Set(0, 1, 2, 3, 4, 5))
  }

  test("requires a topological order") {
    assertThrows[IllegalArgumentException](
      SimplifiedMkp.solve(dag, 100, Vector(1, 0, 2, 3, 4, 5)))
  }

  test("matches subset-enumeration optimum on random dags and budgets") {
    (0 until 25).foreach { seed =>
      val d = BruteForce.randomDag(9, seed)
      val order = d.topological
      Seq(50L, 120L, 250L).foreach { m =>
        val u = SimplifiedMkp.solve(d, m, order)
        assert(Plan.peakMemoryUsage(d, Plan(order, u)) <= m, s"seed=$seed m=$m infeasible")
        val got = u.toSeq.map(d.speedup).sum
        val best = BruteForce.bestFlagsForOrder(d, m, order)
        assert(math.abs(got - best) < 1e-6, s"seed=$seed m=$m: got $got, optimal $best")
      }
    }
  }

  test("empty dag") {
    val d = Dag(Vector.empty, Set.empty)
    assert(SimplifiedMkp.solve(d, 100, Vector.empty).isEmpty)
  }
}
