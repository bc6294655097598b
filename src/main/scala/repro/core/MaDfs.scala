package repro.core

/** Memory-Aware DFS (§ V-B): the solution to S/C Opt Order.
  *
  * Produces a topological order via DFS-style list scheduling: a branch is
  * followed as deep as possible before starting a new one, so a flagged
  * node's children run soon after it and the node is released quickly.
  * When several nodes are eligible, the tie-break prefers the node with the
  * lowest *actual memory consumption* — its size if flagged, 0 otherwise —
  * so that large flagged dependencies are computed last and resident for
  * the shortest possible span (Fig 8: v₂ is scheduled before the flagged
  * v₃, letting v₆ be flagged in the next alternating-optimization round).
  */
object MaDfs {

  /** Compute a topological order for `dag` aware of the flagged set. */
  def order(dag: Dag, flagged: Set[Int]): Vector[Int] = {
    val n = dag.n
    if (n == 0) return Vector.empty
    def consumption(i: Int): Long = if (flagged(i)) dag.size(i) else 0L
    // Deterministic preference: lower memory consumption, then smaller
    // size (cheaper to hold if flagged later), then id.
    def key(i: Int): (Long, Long, Int) = (consumption(i), dag.size(i), i)

    val remainingParents = Array.tabulate(n)(dag.parents(_).size)
    val executed = new Array[Boolean](n)
    def ready(i: Int): Boolean = !executed(i) && remainingParents(i) == 0

    val out = Vector.newBuilder[Int]
    // Execution path for backtracking: most recent executed nodes first.
    var path = List.empty[Int]
    var done = 0

    def execute(i: Int): Unit = {
      executed(i) = true
      dag.children(i).foreach(c => remainingParents(c) -= 1)
      out += i
      path = i :: path
      done += 1
    }

    while (done < n) {
      // Continue the current branch: ready children of the most recent
      // executed node; else backtrack along the path; else start a new
      // branch from any ready node (e.g. an unvisited root).
      val fromPath = path.iterator
        .map(v => dag.children(v).filter(ready))
        .find(_.nonEmpty)
      val candidates = fromPath.getOrElse((0 until n).filter(ready))
      require(candidates.nonEmpty, "no ready node — graph has a cycle")
      execute(candidates.minBy(key))
    }
    out.result()
  }
}
