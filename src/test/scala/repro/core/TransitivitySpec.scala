package repro.core

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class TransitivitySpec extends AnyFunSuite {

  // pairs: (leftId, rightId); left ids 1.., right ids 100..
  private val pairs = Array((1L, 100L), (2L, 100L), (1L, 101L), (3L, 102L))

  test("one-table-dup-free (left dup-free): argmax per right tuple survives") {
    val gamma = Array(0.9, 0.7, 0.6, 0.8)
    val out = Transitivity.oneTableDupFree(pairs, gamma, groupByRight = true)
    assert(out(0) == 0.9)      // winner for right 100
    assert(out(1) == 0.0)      // loser for right 100
    assert(out(2) == 0.6)      // sole pair of right 101
    assert(out(3) == 0.8)
  }

  test("one-table-dup-free (right dup-free): argmax per left tuple survives") {
    val gamma = Array(0.9, 0.7, 0.95, 0.8)
    val out = Transitivity.oneTableDupFree(pairs, gamma, groupByRight = false)
    // left 1 appears in pairs 0 and 2; pair 2 wins.
    assert(out(0) == 0.0 && out(2) == 0.95)
    assert(out(1) == 0.7 && out(3) == 0.8)
  }

  test("one-table-dup-free result has at most one nonzero per group") {
    val rng = new Random(0)
    val ps = Array.tabulate(50)(i => ((i % 10).toLong, (100 + rng.nextInt(8)).toLong))
    val g  = Array.fill(50)(rng.nextDouble())
    val out = Transitivity.oneTableDupFree(ps, g, groupByRight = true)
    ps.indices.groupBy(i => ps(i)._2).values.foreach { grp =>
      assert(grp.count(out(_) > 0) <= 1)
    }
  }

  test("one-table-dup-free keeps total probability mass no larger than input") {
    val g = Array(0.9, 0.7, 0.6, 0.8)
    val out = Transitivity.oneTableDupFree(pairs, g, groupByRight = true)
    assert(out.sum <= g.sum)
  }

  test("both-dup-free: resolves the crossing conflict optimally") {
    // l1-r1 (0.9) conflicts with l1-r2 (0.85) and l2-r1 (0.85).
    // Keeping the two 0.85 edges beats keeping the single 0.9 edge.
    val ps = Array((1L, 100L), (1L, 101L), (2L, 100L))
    val g  = Array(0.9, 0.85, 0.85)
    val out = Transitivity.bothDupFree(ps, g)
    assert(out(0) == 0.0)
    assert(out(1) == 0.85 && out(2) == 0.85)
  }

  test("both-dup-free: leaves sub-threshold probabilities untouched") {
    val ps = Array((1L, 100L), (2L, 101L))
    val g  = Array(0.4, 0.3)
    val out = Transitivity.bothDupFree(ps, g)
    assert(out.sameElements(g))
  }

  test("both-dup-free output is a matching over predicted matches") {
    val rng = new Random(1)
    val ps = Array.tabulate(60)(_ => (rng.nextInt(12).toLong, (100 + rng.nextInt(12)).toLong)).distinct
    val g  = Array.fill(ps.length)(0.5 + rng.nextDouble() * 0.5)
    val out = Transitivity.bothDupFree(ps, g)
    val kept = ps.indices.filter(out(_) > 0.5)
    assert(kept.map(ps(_)._1).distinct.size == kept.size)
    assert(kept.map(ps(_)._2).distinct.size == kept.size)
  }

  test("zeroErGreedy leaves at most one predicted match per tuple") {
    val rng = new Random(2)
    val ps = Array.tabulate(40)(_ => (rng.nextInt(10).toLong, (100 + rng.nextInt(10)).toLong)).distinct
    val g  = Array.fill(ps.length)(rng.nextDouble())
    val out = Transitivity.zeroErGreedy(ps, g)
    val kept = ps.indices.filter(out(_) > 0.5)
    assert(kept.map(ps(_)._1).distinct.size == kept.size)
    assert(kept.map(ps(_)._2).distinct.size == kept.size)
  }

  test("zeroErGreedy can be suboptimal where the assignment is not") {
    val ps = Array((1L, 100L), (1L, 101L), (2L, 100L))
    val g  = Array(0.9, 0.85, 0.85)
    val greedy = Transitivity.zeroErGreedy(ps, g)
    val exact  = Transitivity.bothDupFree(ps, g)
    val keptG = ps.indices.count(greedy(_) > 0.5)
    val keptE = ps.indices.count(exact(_) > 0.5)
    assert(keptG <= keptE) // greedy keeps 1, assignment keeps 2
  }

  test("zeroErGreedySingle removes triangle violations") {
    // Pairs (1,2)=0.9, (1,3)=0.9, (2,3)=0.1: 0.81 > 0.1 — violated.
    val ps = Array((1L, 2L), (1L, 3L), (2L, 3L))
    val g  = Array(0.9, 0.9, 0.1)
    val out = Transitivity.zeroErGreedySingle(ps, g)
    // After the pass the offending product must shrink.
    assert(out(0) * out(1) <= 0.9 * 0.9)
    assert(out(0) * out(1) <= out(2) + 0.5) // moved toward feasibility
  }

  test("postprocessTwoTable keeps the higher-probability pair in a conflict") {
    val ps = Array((1L, 100L), (2L, 100L))
    val g  = Array(0.8, 0.9)
    val out = Transitivity.postprocessTwoTable(ps, g)
    assert(out(0) == 0.0 && out(1) == 0.9)
  }

  test("postprocessTwoTable leaves non-conflicting matches alone") {
    val ps = Array((1L, 100L), (2L, 101L))
    val g  = Array(0.8, 0.9)
    val out = Transitivity.postprocessTwoTable(ps, g)
    assert(out.sameElements(g))
  }

  test("postprocessSingleTable clusters a clean triangle together") {
    val ps = Array((1L, 2L), (1L, 3L), (2L, 3L))
    val g  = Array(0.9, 0.9, 0.8)
    val matches = Transitivity.postprocessSingleTable(ps, g)
    assert(matches == Set((1L, 2L), (1L, 3L), (2L, 3L)))
  }

  test("postprocessSingleTable output is transitively closed") {
    val rng = new Random(3)
    val ids = (1L to 12L).toArray
    val ps = (for (i <- ids.indices; j <- (i + 1) until ids.length) yield (ids(i), ids(j))).toArray
    val g = Array.fill(ps.length)(rng.nextDouble())
    val matches = Transitivity.postprocessSingleTable(ps, g)
    // Build clusters from matches; every intra-cluster pair must be a match.
    val uf = new repro.ml.UnionFind(ids.length)
    val idx = ids.zipWithIndex.toMap
    matches.foreach { case (a, b) => uf.union(idx(a), idx(b)) }
    for (i <- ids.indices; j <- (i + 1) until ids.length
         if uf.find(i) == uf.find(j)) {
      assert(matches.contains((ids(i), ids(j))))
    }
  }

  test("postprocessSingleTable leaves weakly-linked records unclustered") {
    val ps = Array((1L, 2L))
    val g  = Array(0.2)
    assert(Transitivity.postprocessSingleTable(ps, g).isEmpty)
  }
}
