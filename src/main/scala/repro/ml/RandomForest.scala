package repro.ml

import scala.util.Random

/** Random forest classifier — the generic classifier g of the SIMPLE
  * labeling model (paper §3.2).
  *
  * Bootstrap sampling per tree + sqrt(m) feature subsampling per split;
  * predicted probability is the average of per-tree leaf class fractions.
  * The model is a plain serializable case class so a fitted forest can be
  * broadcast to Spark executors and applied as a UDF for distributed
  * inference.
  */
final case class RandomForestModel(trees: Vector[DecisionTree.Tree]) extends Serializable {
  def predictProba(x: Array[Double]): Double = {
    var s = 0.0
    var i = 0
    while (i < trees.length) { s += trees(i).predictProba(x); i += 1 }
    s / trees.length
  }
  def predict(x: Array[Double]): Int = if (predictProba(x) >= 0.5) 1 else 0
}

object RandomForest {
  final case class Params(numTrees: Int = 25, maxDepth: Int = 4,
                          ccpAlpha: Double = 0.0, minLeaf: Int = 1)

  def fit(xs: Array[Array[Double]], ys: Array[Int], params: Params, seed: Long): RandomForestModel = {
    require(xs.length == ys.length && xs.nonEmpty, "empty or mismatched training data")
    val rng   = new Random(seed)
    val n     = xs.length
    val nFeat = xs(0).length
    val fps   = math.max(1, math.round(math.sqrt(nFeat.toDouble)).toInt)
    val trees = Vector.tabulate(params.numTrees) { t =>
      val treeRng = new Random(rng.nextLong())
      val boot    = Array.fill(n)(treeRng.nextInt(n))
      DecisionTree.fit(xs, ys, boot, params.maxDepth, params.ccpAlpha, fps, params.minLeaf, treeRng)
    }
    RandomForestModel(trees)
  }
}
