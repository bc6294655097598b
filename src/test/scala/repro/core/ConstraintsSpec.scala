package repro.core

import org.scalatest.funsuite.AnyFunSuite

class ConstraintsSpec extends AnyFunSuite {

  private val dag = Dag.of(
    sizes = Seq(100, 5, 100, 5, 10, 10), speedups = Seq(100, 5, 100, 5, 10, 10),
    edges = Set((0, 1), (0, 3), (2, 4), (4, 5)))
  private val idOrder = Vector(0, 1, 2, 3, 4, 5)

  test("excluded: oversized nodes") {
    assert(Constraints.excluded(dag, 50) == Set(0, 2))
    assert(Constraints.excluded(dag, 100) == Set.empty[Int])
  }

  test("excluded: zero-speedup nodes") {
    val d = Dag.of(Seq(1, 1), Seq(0.0, 5.0), Set((0, 1)))
    assert(Constraints.excluded(d, 100) == Set(0))
  }

  test("alive sets match residentAt semantics for full candidate set") {
    val sets = Constraints.aliveSets(dag, idOrder, Set.empty)
    (0 until dag.n).foreach { k =>
      val expected = Plan.residentAt(dag, Plan(idOrder, (0 until dag.n).toSet), k)
      assert(sets(k) == expected, s"position $k")
    }
  }

  test("alive sets honor exclusion") {
    val sets = Constraints.aliveSets(dag, idOrder, Set(0))
    assert(sets.forall(!_.contains(0)))
  }

  test("constraint sets are maximal") {
    val sets = Constraints.constraintSets(dag, idOrder, 10)
    sets.foreach { s =>
      assert(!sets.exists(o => s != o && s.subsetOf(o)), s"$s is non-maximal")
    }
  }

  test("constraint sets are non-trivial") {
    val sets = Constraints.constraintSets(dag, idOrder, 10)
    sets.foreach(s => assert(s.toSeq.map(dag.size).sum > 10))
  }

  test("huge budget leaves no constraint sets (all trivial)") {
    assert(Constraints.constraintSets(dag, idOrder, 1000).isEmpty)
  }

  test("tiny budget excludes everything") {
    assert(Constraints.constraintSets(dag, idOrder, 1).isEmpty)
    assert(Constraints.excluded(dag, 1) == (0 until 6).toSet)
  }

  test("every violated subset is covered by some constraint set") {
    // Completeness: any flag set whose peak exceeds M must violate at least
    // one of the generated constraints.
    (0 until 10).foreach { seed =>
      val d = BruteForce.randomDag(8, seed)
      val order = d.topological
      val m = 120L
      val sets = Constraints.constraintSets(d, order, m)
      val excl = Constraints.excluded(d, m)
      (0 until (1 << d.n)).foreach { mask =>
        val flags = (0 until d.n).filter(i => (mask & (1 << i)) != 0).toSet
        if (flags.intersect(excl).isEmpty &&
            Plan.peakMemoryUsage(d, Plan(order, flags)) > m) {
          assert(sets.exists(s => flags.intersect(s).toSeq.map(d.size).sum > m),
            s"seed=$seed flags=$flags escaped all constraints")
        }
      }
    }
  }
}
