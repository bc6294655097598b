package repro.core

import org.scalatest.funsuite.AnyFunSuite

class NodeBaselinesSpec extends AnyFunSuite {

  private val dag = Dag.of(
    sizes = Seq(100, 5, 100, 5, 10, 10), speedups = Seq(100, 5, 100, 5, 10, 10),
    edges = Set((0, 1), (0, 3), (2, 4), (4, 5)))
  private val order = dag.topological

  test("greedy flags in execution order while feasible") {
    val u = NodeBaselines.greedy(dag, 100, order)
    // Greedy takes v0 (first), then cannot take v2 (overlap), takes v4, v5.
    assert(u == Set(0, 4, 5))
    assert(Plan.isFeasible(dag, Plan(order, u), 100))
  }

  test("greedy result is always feasible on random dags") {
    (0 until 20).foreach { s =>
      val d = BruteForce.randomDag(10, s)
      val o = d.topological
      assert(Plan.isFeasible(d, Plan(o, NodeBaselines.greedy(d, 120, o)), 120), s"seed $s")
    }
  }

  test("random result is always feasible and seed-deterministic") {
    (0 until 20).foreach { s =>
      val d = BruteForce.randomDag(10, s)
      val o = d.topological
      val u = NodeBaselines.random(d, 120, o, seed = s)
      assert(Plan.isFeasible(d, Plan(o, u), 120), s"seed $s")
      assert(u == NodeBaselines.random(d, 120, o, seed = s))
    }
  }

  test("ratio prefers high speedup-per-byte nodes") {
    // v5 has ratio 10, v0 ratio 1: with budget for one small node only,
    // ratio-based picks the dense one.
    val d = Dag.of(Seq(100, 10), Seq(100, 100), Set((0, 1)))
    val u = NodeBaselines.ratio(d, 10, d.topological)
    assert(u == Set(1))
  }

  test("ratio result is always feasible") {
    (0 until 20).foreach { s =>
      val d = BruteForce.randomDag(10, s)
      val o = d.topological
      assert(Plan.isFeasible(d, Plan(o, NodeBaselines.ratio(d, 120, o)), 120), s"seed $s")
    }
  }

  test("oversized and zero-speedup nodes are skipped by all baselines") {
    val d = Dag.of(Seq(500, 10, 10), Seq(100, 0, 50), Set((0, 1), (1, 2)))
    Seq(
      NodeBaselines.greedy(d, 100, d.topological),
      NodeBaselines.random(d, 100, d.topological, 1),
      NodeBaselines.ratio(d, 100, d.topological),
    ).foreach { u =>
      assert(!u.contains(0)) // oversized
      assert(!u.contains(1)) // zero speedup
    }
  }

  test("MKP beats greedy when greedy commits early to a blocking node") {
    // Greedy flags v0 first, blocking the higher-value pair downstream.
    val d = Dag.of(Seq(60, 50, 50), Seq(10, 100, 100),
      Set((0, 1), (0, 2), (1, 2)))
    val o = d.topological
    val greedy = NodeBaselines.greedy(d, 100, o).toSeq.map(d.speedup).sum
    val mkp = SimplifiedMkp.solve(d, 100, o).toSeq.map(d.speedup).sum
    assert(mkp > greedy)
  }
}
