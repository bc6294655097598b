package repro.core

import org.scalatest.funsuite.AnyFunSuite

class MaDfsSpec extends AnyFunSuite {

  test("produces a topological order on random dags") {
    (0 until 30).foreach { s =>
      val d = BruteForce.randomDag(12, s)
      val rnd = new scala.util.Random(s)
      val flags = (0 until d.n).filter(_ => rnd.nextBoolean()).toSet
      assert(d.isTopological(MaDfs.order(d, flags)), s"seed $s")
    }
  }

  test("tie-break prefers lower actual memory consumption (Fig 8 semantics)") {
    // v0 → {v1, v2}; v1 → v3; v2 → v4; v4 depends on v3 too. v2 is flagged
    // (consumption 60), v1 is not (consumption 0, despite size 80):
    // MA-DFS must branch into v1 first so the flagged v2 is resident briefly.
    val d = Dag.of(Seq(10, 80, 60, 10, 10), Seq(1, 1, 1, 1, 1),
      Set((0, 1), (0, 2), (1, 3), (2, 4), (3, 4)))
    val flagged = Set(2)
    val order = MaDfs.order(d, flagged)
    assert(d.isTopological(order))
    assert(order.indexOf(1) < order.indexOf(2), s"v1 should precede flagged v2 in $order")
    // The flagged node is executed immediately before its consumer.
    assert(order == Vector(0, 1, 3, 2, 4))
  }

  test("MA-DFS order has lower average memory than the greedy-by-size DFS") {
    val d = Dag.of(Seq(10, 80, 60, 10, 10), Seq(1, 1, 1, 1, 1),
      Set((0, 1), (0, 2), (1, 3), (2, 4), (3, 4)))
    val flagged = Set(2)
    val maDfs = Plan(MaDfs.order(d, flagged), flagged)
    val other = Plan(Vector(0, 2, 1, 3, 4), flagged) // schedules flagged branch first
    assert(d.isTopological(other.order))
    assert(Plan.averageMemoryUsage(d, maDfs) < Plan.averageMemoryUsage(d, other))
  }

  test("finishes a branch before starting a new root") {
    // Two independent chains; DFS discipline keeps each chain contiguous.
    val d = Dag.of(Seq(1, 1, 1, 1), Seq(1, 1, 1, 1), Set((0, 1), (2, 3)))
    val order = MaDfs.order(d, Set.empty)
    val pos = order.zipWithIndex.toMap
    assert(math.abs(pos(0) - pos(1)) == 1)
    assert(math.abs(pos(2) - pos(3)) == 1)
  }

  test("unflagged nodes have zero consumption regardless of size") {
    // Root's two children: huge unflagged (0) vs tiny flagged (1).
    val d = Dag.of(Seq(1, 1000, 1), Seq(1, 1, 1), Set((0, 1), (0, 2)))
    val order = MaDfs.order(d, Set(2))
    assert(order.indexOf(1) < order.indexOf(2))
  }

  test("deterministic") {
    val d = BruteForce.randomDag(15, 7)
    val flags = Set(1, 3, 5)
    assert(MaDfs.order(d, flags) == MaDfs.order(d, flags))
  }

  test("empty and singleton graphs") {
    assert(MaDfs.order(Dag(Vector.empty, Set.empty), Set.empty).isEmpty)
    val one = Dag.of(Seq(5), Seq(1), Set.empty)
    assert(MaDfs.order(one, Set(0)) == Vector(0))
  }

  test("average memory beats the Kahn order in aggregate on random dags") {
    var maTotal, kahnTotal = 0.0
    (0 until 30).foreach { s =>
      val d = BruteForce.randomDag(10, s)
      val rnd = new scala.util.Random(s + 500)
      val flags = (0 until d.n).filter(_ => rnd.nextDouble() < 0.4).toSet
      maTotal += Plan.averageMemoryUsage(d, Plan(MaDfs.order(d, flags), flags))
      kahnTotal += Plan.averageMemoryUsage(d, Plan(d.topological, flags))
    }
    // MA-DFS is a heuristic; it should clearly improve over plain Kahn in
    // aggregate even if individual instances can tie or regress.
    assert(maTotal < kahnTotal,
      f"MA-DFS total $maTotal%.1f not below Kahn total $kahnTotal%.1f")
  }
}
