package repro.ml

import scala.collection.mutable

/** Min-cost bipartite assignment, used for the exact transitivity solution
  * when BOTH tables are duplicate-free (paper §4.2).
  *
  * The paper uses scipy's LAPJV; offline we implement the classic Hungarian
  * algorithm with potentials (O(n^3) per component, same optimum). Following
  * the paper's noted optimization, the caller only passes edges with matching
  * probability > 0.5, so component sizes are small; we decompose into
  * connected components and pad each with per-row dummy columns so rows may
  * stay unmatched at zero gain.
  */
object Assignment {

  /** Maximum-weight matching over sparse positive-weight edges.
    * Edges are (left, right, weight>0); returns the set of selected edge
    * indices into `edges`.
    */
  def maxWeightMatching(edges: IndexedSeq[(Int, Int, Double)]): Set[Int] = {
    if (edges.isEmpty) return Set.empty
    // Connected components over the bipartite edge graph.
    val leftIds  = edges.map(_._1).distinct
    val rightIds = edges.map(_._2).distinct
    val lIdx = leftIds.zipWithIndex.toMap
    val rIdx = rightIds.zipWithIndex.toMap
    val uf = new UnionFind(leftIds.size + rightIds.size)
    edges.foreach { case (l, r, _) => uf.union(lIdx(l), leftIds.size + rIdx(r)) }
    val byComp = edges.indices.groupBy(e => uf.find(lIdx(edges(e)._1)))
    byComp.values.flatMap(es => solveComponent(edges, es.toVector)).toSet
  }

  /** Hungarian on one component; returns selected edge indices. */
  private def solveComponent(all: IndexedSeq[(Int, Int, Double)], es: Vector[Int]): Set[Int] = {
    val ls = es.map(all(_)._1).distinct
    val rs = es.map(all(_)._2).distinct
    val li = ls.zipWithIndex.toMap
    val ri = rs.zipWithIndex.toMap
    val n  = ls.size              // rows
    val m  = rs.size + n          // real right cols + one dummy col per row
    val Big = 1e12
    // cost(i)(j): -weight for real edges, 0 for row i's own dummy, Big otherwise.
    val cost = Array.fill(n, m)(Big)
    for (i <- 0 until n) cost(i)(rs.size + i) = 0.0
    val edgeAt = mutable.Map.empty[(Int, Int), Int] // (row,col) -> edge idx (max weight wins)
    es.foreach { e =>
      val (l, r, w) = all(e)
      val i = li(l); val j = ri(r)
      if (-w < cost(i)(j)) { cost(i)(j) = -w; edgeAt((i, j)) = e }
    }

    // Hungarian with potentials, 1-indexed internally (e-maxx formulation).
    val INF = Double.MaxValue / 4
    val u = Array.fill(n + 1)(0.0)
    val v = Array.fill(m + 1)(0.0)
    val p = Array.fill(m + 1)(0)   // p(j) = row matched to column j
    val way = Array.fill(m + 1)(0)
    for (i <- 1 to n) {
      p(0) = i
      var j0 = 0
      val minv = Array.fill(m + 1)(INF)
      val used = Array.fill(m + 1)(false)
      var done = false
      while (!done) {
        used(j0) = true
        val i0 = p(j0)
        var delta = INF
        var j1 = -1
        for (j <- 1 to m if !used(j)) {
          val cur = cost(i0 - 1)(j - 1) - u(i0) - v(j)
          if (cur < minv(j)) { minv(j) = cur; way(j) = j0 }
          if (minv(j) < delta) { delta = minv(j); j1 = j }
        }
        for (j <- 0 to m) {
          if (used(j)) { u(p(j)) += delta; v(j) -= delta }
          else minv(j) -= delta
        }
        j0 = j1
        if (p(j0) == 0) done = true
      }
      var jj = j0
      while (jj != 0) { val j1 = way(jj); p(jj) = p(j1); jj = j1 }
    }

    val out = mutable.Set.empty[Int]
    for (j <- 1 to m) {
      val i = p(j)
      if (i != 0) edgeAt.get((i - 1, j - 1)).foreach(out += _)
    }
    out.toSet
  }
}
