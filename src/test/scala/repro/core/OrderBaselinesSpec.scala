package repro.core

import org.scalatest.funsuite.AnyFunSuite

class OrderBaselinesSpec extends AnyFunSuite {

  test("simulated annealing output is topological") {
    (0 until 15).foreach { s =>
      val d = BruteForce.randomDag(10, s)
      val flags = Set(0, 2, 4)
      val o = OrderBaselines.simulatedAnnealing(d, flags, d.topological,
        iterations = 500, seed = s)
      assert(d.isTopological(o), s"seed $s")
    }
  }

  test("simulated annealing does not regress the initial order's usage") {
    (0 until 10).foreach { s =>
      val d = BruteForce.randomDag(10, s)
      val rnd = new scala.util.Random(s)
      val flags = (0 until d.n).filter(_ => rnd.nextDouble() < 0.4).toSet
      val init = d.topological
      val out = OrderBaselines.simulatedAnnealing(d, flags, init, iterations = 2000, seed = s)
      assert(Plan.averageMemoryUsage(d, Plan(out, flags)) <=
        Plan.averageMemoryUsage(d, Plan(init, flags)) + 1e-9, s"seed $s")
    }
  }

  test("simulated annealing is seed-deterministic") {
    val d = BruteForce.randomDag(10, 3)
    val flags = Set(1, 2)
    val a = OrderBaselines.simulatedAnnealing(d, flags, d.topological, 300, seed = 9)
    val b = OrderBaselines.simulatedAnnealing(d, flags, d.topological, 300, seed = 9)
    assert(a == b)
  }

  test("simulated annealing requires a topological initial order") {
    val d = Dag.of(Seq(1, 1), Seq(1, 1), Set((0, 1)))
    assertThrows[IllegalArgumentException](
      OrderBaselines.simulatedAnnealing(d, Set.empty, Vector(1, 0), 10))
  }

  test("separator output is topological") {
    (0 until 15).foreach { s =>
      val d = BruteForce.randomDag(12, s)
      assert(d.isTopological(OrderBaselines.separator(d, Set(0, 3, 5))), s"seed $s")
    }
  }

  test("separator handles singleton and empty graphs") {
    assert(OrderBaselines.separator(Dag(Vector.empty, Set.empty), Set.empty).isEmpty)
    assert(OrderBaselines.separator(Dag.of(Seq(1), Seq(1), Set.empty), Set(0)) == Vector(0))
  }

  test("separator is deterministic") {
    val d = BruteForce.randomDag(12, 5)
    assert(OrderBaselines.separator(d, Set(1, 4)) == OrderBaselines.separator(d, Set(1, 4)))
  }

  test("MA-DFS is far faster than SA at paper iteration counts (§ VI-H shape)") {
    // SA at the paper's 10,000 iterations directly minimizes average memory
    // and can edge out MA-DFS per instance, but costs orders of magnitude
    // more time — which is the paper's Fig 13 point.
    val d = BruteForce.randomDag(60, 77)
    val flags = (0 until d.n by 3).toSet
    def time[A](f: => A): Double = {
      val t0 = System.nanoTime(); f; (System.nanoTime() - t0) / 1e6
    }
    MaDfs.order(d, flags) // JIT warmup
    val maMs = time(MaDfs.order(d, flags))
    val saMs = time(OrderBaselines.simulatedAnnealing(d, flags, d.topological, 10000, 1))
    assert(maMs < saMs, f"MA-DFS $maMs%.2f ms not faster than SA $saMs%.2f ms")
  }

  test("MA-DFS yields competitive average memory against SA per § VI-F") {
    // MA-DFS need not win per instance, but must stay within a small factor
    // of the expensive SA optimum in aggregate.
    var ma, sa = 0.0
    (0 until 12).foreach { s =>
      val d = BruteForce.randomDag(10, s + 70)
      val rnd = new scala.util.Random(s)
      val flags = (0 until d.n).filter(_ => rnd.nextDouble() < 0.4).toSet
      ma += Plan.averageMemoryUsage(d, Plan(MaDfs.order(d, flags), flags))
      sa += Plan.averageMemoryUsage(d, Plan(
        OrderBaselines.simulatedAnnealing(d, flags, d.topological, 1000, s), flags))
    }
    assert(ma <= sa * 2.0, f"MA-DFS $ma%.1f more than 2x SA $sa%.1f")
  }
}
