package repro.ml

import scala.util.Random

/** A binary-classification CART decision tree (Gini impurity).
  *
  * Capacity is controlled by two knobs, mirroring the paper's use of
  * scikit-learn's `max_depth` and `ccp_alpha`:
  *   - `maxDepth`: hard depth limit;
  *   - `ccpAlpha`: a weighted-impurity-decrease threshold — a split is only
  *     kept if it reduces (n_node/n_total)-weighted Gini impurity by at least
  *     `ccpAlpha`. This plays the same capacity-control role as
  *     cost-complexity pruning and, like in the paper, is selected by cross
  *     validation on the current pseudo-labels (see [[CrossVal]]).
  *
  * Feature subsampling per split (`featuresPerSplit`) supports the random
  * forest ensemble in [[RandomForest]].
  */
object DecisionTree {

  /** Tree node; leaves carry P(class = 1). */
  sealed trait Node
  final case class Leaf(prob: Double) extends Node
  final case class Split(feature: Int, threshold: Double, left: Node, right: Node) extends Node

  final case class Tree(root: Node) {
    def predictProba(x: Array[Double]): Double = {
      var n = root
      while (true) {
        n match {
          case Leaf(p) => return p
          case Split(f, t, l, r) => n = if (x(f) <= t) l else r
        }
      }
      0.5 // unreachable
    }
  }

  private def gini(pos: Double, total: Double): Double =
    if (total <= 0) 0.0
    else { val p = pos / total; 2.0 * p * (1.0 - p) }

  /** Train a tree on rows `idx` of (xs, ys). ys in {0, 1}. */
  def fit(xs: Array[Array[Double]], ys: Array[Int], idx: Array[Int],
          maxDepth: Int, ccpAlpha: Double, featuresPerSplit: Int,
          minLeaf: Int, rng: Random): Tree = {
    val nTotal = idx.length.toDouble
    val nFeat  = if (xs.isEmpty) 0 else xs(0).length

    def build(rows: Array[Int], depth: Int): Node = {
      val n   = rows.length
      val pos = rows.count(ys(_) == 1).toDouble
      val p   = if (n == 0) 0.5 else pos / n
      if (depth >= maxDepth || n < 2 * minLeaf || pos == 0 || pos == n) return Leaf(p)

      val impurity = gini(pos, n)
      val feats = rng.shuffle((0 until nFeat).toList).take(math.max(1, featuresPerSplit))
      var bestGain = 0.0
      var bestFeat = -1
      var bestThr  = 0.0
      for (f <- feats) {
        // Candidate thresholds: midpoints between distinct sorted values
        // (capped — LF-vote features only have 3 distinct values anyway).
        val vals = rows.map(r => xs(r)(f)).distinct.sorted
        if (vals.length > 1) {
          val thresholds =
            if (vals.length <= 16) vals.init.indices.map(i => (vals(i) + vals(i + 1)) / 2.0)
            else (1 until 16).map(i => vals((vals.length * i) / 16))
          for (thr <- thresholds) {
            var nl = 0; var posL = 0
            var i = 0
            while (i < n) {
              val r = rows(i)
              if (xs(r)(f) <= thr) { nl += 1; if (ys(r) == 1) posL += 1 }
              i += 1
            }
            val nr = n - nl
            if (nl >= minLeaf && nr >= minLeaf) {
              val posR = pos - posL
              val childImp = (nl * gini(posL, nl) + nr * gini(posR, nr)) / n
              // Weighted impurity decrease relative to the full training set —
              // the quantity thresholded by ccpAlpha.
              val gain = (n / nTotal) * (impurity - childImp)
              if (gain > bestGain) { bestGain = gain; bestFeat = f; bestThr = thr }
            }
          }
        }
      }
      if (bestFeat < 0 || bestGain < ccpAlpha) Leaf(p)
      else {
        val (lRows, rRows) = rows.partition(r => xs(r)(bestFeat) <= bestThr)
        Split(bestFeat, bestThr, build(lRows, depth + 1), build(rRows, depth + 1))
      }
    }

    Tree(build(idx, 0))
  }
}
