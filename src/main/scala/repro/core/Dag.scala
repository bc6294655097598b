package repro.core

/** A single MV update in the dependency graph (§ IV, Table II).
  *
  * @param id        index of the node in [0, n); doubles as the vertex id
  * @param name      human-readable MV name (for reports)
  * @param sizeBytes estimated size s_i of the node's output table — the
  *                  memory it occupies in the Memory Catalog when flagged
  * @param speedupMs speedup score t_i: estimated end-to-end time saved
  *                  (milliseconds) by keeping this node's output in memory
  */
final case class MvNode(id: Int, name: String, sizeBytes: Long, speedupMs: Double) {
  require(sizeBytes >= 0, s"node $name has negative size")
  require(speedupMs >= 0, s"node $name has negative speedup score")
}

/** The MV dependency graph G = {V, E} (§ IV).
  *
  * Nodes are indexed 0..n-1; an edge (p, c) means MV `c` reads the output
  * of MV `p`, so `p` must execute before `c`. Construction validates that
  * the graph is acyclic and that all edge endpoints exist.
  */
final case class Dag(nodes: Vector[MvNode], edges: Set[(Int, Int)]) {
  require(nodes.zipWithIndex.forall { case (nd, i) => nd.id == i },
    "node ids must equal their position in the nodes vector")
  require(edges.forall { case (p, c) => p != c && valid(p) && valid(c) },
    "edge endpoints must be distinct, existing nodes")

  private def valid(i: Int): Boolean = i >= 0 && i < nodes.size

  /** Number of nodes n = |V|. */
  val n: Int = nodes.size

  /** children(i): nodes that consume i's output, sorted for determinism. */
  val children: Vector[Vector[Int]] = {
    val b = Vector.fill(n)(Vector.newBuilder[Int])
    edges.toSeq.sorted.foreach { case (p, c) => b(p) += c }
    b.map(_.result())
  }

  /** parents(i): nodes whose output i consumes, sorted for determinism. */
  val parents: Vector[Vector[Int]] = {
    val b = Vector.fill(n)(Vector.newBuilder[Int])
    edges.toSeq.sorted.foreach { case (p, c) => b(c) += p }
    b.map(_.result())
  }

  /** Deterministic topological order (Kahn's algorithm, smallest id first).
    * Serves as GetTopologicalOrder in Algorithm 2; throws on a cycle.
    */
  def topological: Vector[Int] = {
    val indeg = Array.tabulate(n)(parents(_).size)
    val ready = scala.collection.mutable.SortedSet.empty[Int]
    (0 until n).foreach(i => if (indeg(i) == 0) ready += i)
    val out = Vector.newBuilder[Int]
    var done = 0
    while (ready.nonEmpty) {
      val v = ready.head; ready -= v
      out += v; done += 1
      children(v).foreach { c =>
        indeg(c) -= 1
        if (indeg(c) == 0) ready += c
      }
    }
    require(done == n, "dependency graph contains a cycle")
    out.result()
  }

  /** True iff `order` is a permutation of all nodes respecting every edge. */
  def isTopological(order: Seq[Int]): Boolean = {
    if (order.size != n || order.toSet != (0 until n).toSet) return false
    val pos = Array.ofDim[Int](n)
    order.zipWithIndex.foreach { case (v, i) => pos(v) = i }
    edges.forall { case (p, c) => pos(p) < pos(c) }
  }

  /** Nodes with no parents (read only base tables). */
  def roots: Vector[Int] = (0 until n).filter(parents(_).isEmpty).toVector

  /** Nodes with no children (final MVs of the workload). */
  def sinks: Vector[Int] = (0 until n).filter(children(_).isEmpty).toVector

  def size(i: Int): Long      = nodes(i).sizeBytes
  def speedup(i: Int): Double = nodes(i).speedupMs

  /** Transitive descendants of i (excluding i). */
  def descendants(i: Int): Set[Int] = {
    val seen = scala.collection.mutable.Set.empty[Int]
    def rec(v: Int): Unit = children(v).foreach { c =>
      if (seen.add(c)) rec(c)
    }
    rec(i); seen.toSet
  }

  /** Transitive ancestors of i (excluding i). */
  def ancestors(i: Int): Set[Int] = {
    val seen = scala.collection.mutable.Set.empty[Int]
    def rec(v: Int): Unit = parents(v).foreach { p =>
      if (seen.add(p)) rec(p)
    }
    rec(i); seen.toSet
  }
}

object Dag {
  /** Convenience constructor from (size, speedup) pairs; names are v0..v{n-1}. */
  def of(sizes: Seq[Long], speedups: Seq[Double], edges: Set[(Int, Int)]): Dag = {
    require(sizes.size == speedups.size)
    Dag(
      sizes.zip(speedups).zipWithIndex.map { case ((s, t), i) => MvNode(i, s"v$i", s, t) }.toVector,
      edges)
  }
}
