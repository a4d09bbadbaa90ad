package repro.opt

/** DYN-LIN (§5.3, Theorem 5.1): O(N) dynamic program for OPT-RET restricted
  * to a directed line graph node 0 → 1 → … → N−1 (every parent has one
  * child, every child one parent — e.g. a chain of saved intermediate edits).
  *
  * Recurrence (paper, §5.3): with ret_i = (C_s + C_m·f_i)·S_i and
  * del_i = A_i·C_{i−1,i},
  *   ALG[0] = ret_0
  *   ALG[1] = min(ret_1, del_1) + ALG[0]
  *   ALG[i] = min(ret_i + ALG[i−1],  del_i + ret_{i−1} + ALG[i−2])
  * Deleting node i forces retaining its only parent i−1.
  */
object DynLin {

  /** @param retention  ret_i per node, in chain order (root first)
    * @param deletion   del_i = A_i·C_{i−1,i}; deletion(0) is unused — the
    *                   root has no parent and must be retained
    * @return (optimal cost, retained node indices)
    */
  def solve(retention: IndexedSeq[Double], deletion: IndexedSeq[Double]): (Double, Set[Int]) = {
    val n = retention.size
    require(n >= 1 && deletion.size == n, "retention/deletion must align")
    if (n == 1) return (retention(0), Set(0))

    val alg = new Array[Double](n)
    val deleted = new Array[Boolean](n)
    alg(0) = retention(0)
    if (retention(1) <= deletion(1)) alg(1) = retention(1) + alg(0)
    else { alg(1) = deletion(1) + alg(0); deleted(1) = true }

    for (i <- 2 until n) {
      val keep = retention(i) + alg(i - 1)
      val drop = deletion(i) + retention(i - 1) + alg(i - 2)
      if (keep <= drop) alg(i) = keep
      else { alg(i) = drop; deleted(i) = true }
    }

    // Backtrack: if node i was deleted, node i−1 is compulsorily retained and
    // the prefix solution continues from i−2.
    val retained = scala.collection.mutable.Set.empty[Int]
    var i = n - 1
    while (i >= 0) {
      if (deleted(i)) { retained += (i - 1); i -= 2 }
      else { retained += i; i -= 1 }
    }
    (alg(n - 1), retained.toSet)
  }

  /** Convenience wrapper from an [[OptProblem]] that must be a single line
    * graph; nodes are ordered root → leaf.
    */
  def solveProblem(p: OptProblem): OptSolution = {
    val order = lineOrder(p)
    val ret = order.map(p.retentionCost).toIndexedSeq
    val edgeByChild = p.edges.map(e => e.child -> e).toMap
    val del = order.zipWithIndex.map { case (v, i) =>
      if (i == 0) Double.PositiveInfinity else p.deletionCost(v, edgeByChild(v.name))
    }.toIndexedSeq
    val (cost, keptIdx) = solve(ret, del)
    val retained = keptIdx.map(order(_).name)
    val via = order.zipWithIndex.collect {
      case (v, i) if !retained(v.name) => v.name -> edgeByChild(v.name)
    }.toMap
    OptSolution(retained, via, cost)
  }

  /** Validate line-graph shape and return nodes in chain order. */
  def lineOrder(p: OptProblem): Seq[OptNode] = {
    val byName = p.nodes.map(n => n.name -> n).toMap
    val childOf = p.edges.map(e => e.parent -> e.child).toMap
    val hasParent = p.edges.map(_.child).toSet
    require(p.edges.map(_.parent).distinct.size == p.edges.size, "a parent has two children — not a line")
    require(p.edges.map(_.child).distinct.size == p.edges.size, "a child has two parents — not a line")
    val roots = p.nodes.filterNot(n => hasParent(n.name))
    require(roots.size == 1, s"line graph needs exactly one root, got ${roots.size}")
    val order = Seq.newBuilder[OptNode]
    var cur: Option[String] = Some(roots.head.name)
    var seen = 0
    while (cur.isDefined) {
      order += byName(cur.get)
      seen += 1
      require(seen <= p.nodes.size, "cycle detected — not a line")
      cur = childOf.get(cur.get)
    }
    val res = order.result()
    require(res.size == p.nodes.size, "disconnected nodes — not a single line")
    res
  }
}
