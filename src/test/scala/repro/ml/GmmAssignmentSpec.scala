package repro.ml

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.{Gen, Prop}
import repro.PropSupport
import scala.util.Random

class GmmAssignmentSpec extends AnyFunSuite with PropSupport {

  // ---- GMM ------------------------------------------------------------------

  private def twoBlobs(n: Int, sep: Double, seed: Long): (Array[Array[Double]], Array[Int]) = {
    val rng = new Random(seed)
    val a = Array.fill(n)(Array(rng.nextGaussian() * 0.3, rng.nextGaussian() * 0.3))
    val b = Array.fill(n)(Array(sep + rng.nextGaussian() * 0.3, sep + rng.nextGaussian() * 0.3))
    (a ++ b, Array.fill(n)(0) ++ Array.fill(n)(1))
  }

  test("GMM separates two well-separated blobs") {
    val (xs, ys) = twoBlobs(100, 4.0, 0)
    val init = ys.map(y => if (y == 1) 0.8 else 0.2)
    val m = Gmm.fit(xs, init, seed = 0)
    val acc = xs.indices.count(i => (m.posterior(xs(i)) >= 0.5) == (ys(i) == 1)).toDouble / xs.length
    assert(acc > 0.98)
  }

  test("GMM posterior is a probability") {
    val (xs, ys) = twoBlobs(50, 2.0, 1)
    val m = Gmm.fit(xs, ys.map(y => if (y == 1) 0.7 else 0.3), seed = 1)
    xs.foreach { x => val p = m.posterior(x); assert(p >= 0 && p <= 1) }
  }

  test("GMM component means land near the blob centers") {
    val (xs, ys) = twoBlobs(150, 5.0, 2)
    val m = Gmm.fit(xs, ys.map(y => if (y == 1) 0.9 else 0.1), seed = 2)
    assert(math.abs(m.mean(1)(0) - 5.0) < 0.5)
    assert(math.abs(m.mean(0)(0) - 0.0) < 0.5)
  }

  test("GMM variance floor prevents degenerate components") {
    val xs = Array.fill(20)(Array(1.0)) // zero-variance data
    val m = Gmm.fit(xs, Array.fill(20)(0.5), seed = 3)
    assert(m.variance.forall(_.forall(_ >= 1e-4)))
  }

  // ---- Assignment -----------------------------------------------------------

  /** Brute-force max-weight matching for cross-checking. */
  private def bruteBest(edges: IndexedSeq[(Int, Int, Double)]): Double = {
    def rec(i: Int, usedL: Set[Int], usedR: Set[Int]): Double =
      if (i == edges.size) 0.0
      else {
        val (l, r, w) = edges(i)
        val skip = rec(i + 1, usedL, usedR)
        if (usedL(l) || usedR(r)) skip
        else math.max(skip, w + rec(i + 1, usedL + l, usedR + r))
      }
    rec(0, Set.empty, Set.empty)
  }

  private def weight(edges: IndexedSeq[(Int, Int, Double)], sel: Set[Int]): Double =
    sel.toSeq.map(edges(_)._3).sum

  test("assignment picks the single best edge in a conflict") {
    val edges = IndexedSeq((0, 0, 1.0), (1, 0, 2.0))
    val sel = Assignment.maxWeightMatching(edges)
    assert(sel == Set(1))
  }

  test("assignment beats greedy on the classic crossing case") {
    // Greedy takes (0,0,3.0) and loses (0,1,2.9)+(1,0,2.9)=5.8.
    val edges = IndexedSeq((0, 0, 3.0), (0, 1, 2.9), (1, 0, 2.9))
    val sel = Assignment.maxWeightMatching(edges)
    assert(weight(edges, sel) > 5.7)
  }

  test("assignment is a matching: no shared endpoints") {
    val rng = new Random(0)
    val edges = IndexedSeq.fill(20)((rng.nextInt(5), rng.nextInt(5), rng.nextDouble() + 0.1))
    val sel = Assignment.maxWeightMatching(edges)
    val ls = sel.toSeq.map(edges(_)._1); val rs = sel.toSeq.map(edges(_)._2)
    assert(ls.distinct.size == ls.size && rs.distinct.size == rs.size)
  }

  test("assignment on empty edges is empty") {
    assert(Assignment.maxWeightMatching(IndexedSeq.empty) == Set.empty)
  }

  test("assignment handles disjoint components independently") {
    val edges = IndexedSeq((0, 0, 1.0), (10, 10, 1.0), (20, 20, 1.0))
    assert(Assignment.maxWeightMatching(edges) == Set(0, 1, 2))
  }

  test("property: assignment matches brute force optimum on random instances") {
    val genEdges = Gen.choose(1, 10).flatMap { k =>
      Gen.listOfN(k, Gen.zip(Gen.choose(0, 3), Gen.choose(0, 3), Gen.choose(1, 100)))
    }
    checkProp(Prop.forAll(genEdges) { raw =>
      val edges = raw.map { case (l, r, w) => (l, r, w.toDouble) }.toIndexedSeq
      val sel = Assignment.maxWeightMatching(edges)
      math.abs(weight(edges, sel) - bruteBest(edges)) < 1e-9
    }, minTests = 60)
  }
}
