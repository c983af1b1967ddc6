package repro.ml

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.{Gen, Prop}
import repro.PropSupport
import scala.util.Random

class TreeForestSpec extends AnyFunSuite with PropSupport {

  private def xor(n: Int, seed: Long): (Array[Array[Double]], Array[Int]) = {
    val rng = new Random(seed)
    val xs = Array.fill(n)(Array(rng.nextInt(2).toDouble, rng.nextInt(2).toDouble))
    val ys = xs.map(x => if (x(0) != x(1)) 1 else 0)
    (xs, ys)
  }

  test("single tree separates a linearly separable 1-D problem") {
    val xs = Array.tabulate(100)(i => Array(i.toDouble))
    val ys = xs.map(x => if (x(0) >= 50) 1 else 0)
    val t = DecisionTree.fit(xs, ys, xs.indices.toArray, maxDepth = 3,
      ccpAlpha = 0.0, featuresPerSplit = 1, minLeaf = 1, new Random(0))
    assert(xs.indices.forall(i => (t.predictProba(xs(i)) >= 0.5) == (ys(i) == 1)))
  }

  test("depth-1 tree cannot fit XOR but depth-2 can") {
    val (xs, ys) = xor(400, 1)
    def acc(depth: Int): Double = {
      val t = DecisionTree.fit(xs, ys, xs.indices.toArray, depth,
        ccpAlpha = 0.0, featuresPerSplit = 2, minLeaf = 1, new Random(2))
      xs.indices.count(i => (t.predictProba(xs(i)) >= 0.5) == (ys(i) == 1)).toDouble / xs.length
    }
    assert(acc(1) < 0.75)
    assert(acc(2) > 0.95)
  }

  test("ccpAlpha large enough prunes everything to a leaf") {
    val xs = Array.tabulate(100)(i => Array(i.toDouble))
    val ys = xs.map(x => if (x(0) >= 50) 1 else 0)
    val t = DecisionTree.fit(xs, ys, xs.indices.toArray, maxDepth = 4,
      ccpAlpha = 10.0, featuresPerSplit = 1, minLeaf = 1, new Random(0))
    assert(t.root.isInstanceOf[DecisionTree.Leaf])
  }

  test("leaf probability equals class fraction on pure-leaf data") {
    val xs = Array.fill(40)(Array(1.0))
    val ys = Array.fill(30)(1) ++ Array.fill(10)(0)
    val t = DecisionTree.fit(xs, ys, xs.indices.toArray, maxDepth = 3,
      ccpAlpha = 0.0, featuresPerSplit = 1, minLeaf = 1, new Random(0))
    assert(math.abs(t.predictProba(Array(1.0)) - 0.75) < 1e-9)
  }

  test("forest learns XOR") {
    val (xs, ys) = xor(500, 3)
    val m = RandomForest.fit(xs, ys, RandomForest.Params(numTrees = 20, maxDepth = 4), seed = 0)
    val acc = xs.indices.count(i => m.predict(xs(i)) == ys(i)).toDouble / xs.length
    assert(acc > 0.95)
  }

  test("forest predictProba is the average of tree probabilities") {
    val (xs, ys) = xor(200, 4)
    val m = RandomForest.fit(xs, ys, RandomForest.Params(numTrees = 7, maxDepth = 3), seed = 1)
    val x = Array(1.0, 0.0)
    val manual = m.trees.map(_.predictProba(x)).sum / m.trees.size
    assert(math.abs(m.predictProba(x) - manual) < 1e-12)
  }

  test("forest is deterministic in seed") {
    val (xs, ys) = xor(200, 5)
    val a = RandomForest.fit(xs, ys, RandomForest.Params(numTrees = 5, maxDepth = 3), seed = 42)
    val b = RandomForest.fit(xs, ys, RandomForest.Params(numTrees = 5, maxDepth = 3), seed = 42)
    assert(xs.forall(x => a.predictProba(x) == b.predictProba(x)))
  }

  test("forest handles vote-like {-1,0,1} features") {
    val rng = new Random(6)
    val xs = Array.fill(300)(Array.fill(5)((rng.nextInt(3) - 1).toDouble))
    val ys = xs.map(x => if (x.sum > 0) 1 else 0)
    val m = RandomForest.fit(xs, ys, RandomForest.Params(numTrees = 25, maxDepth = 6), seed = 2)
    val acc = xs.indices.count(i => m.predict(xs(i)) == ys(i)).toDouble / xs.length
    assert(acc > 0.9)
  }

  test("property: predictions are probabilities in [0,1]") {
    checkProp(Prop.forAll(Gen.choose(10L, 10000L)) { seed =>
      val (xs, ys) = xor(50, seed)
      val m = RandomForest.fit(xs, ys, RandomForest.Params(numTrees = 3, maxDepth = 3), seed)
      xs.forall { x => val p = m.predictProba(x); p >= 0.0 && p <= 1.0 }
    }, minTests = 20)
  }

  test("fit rejects empty training data") {
    intercept[IllegalArgumentException] {
      RandomForest.fit(Array.empty, Array.empty, RandomForest.Params(), 0)
    }
  }
}
