package repro.baselines

import repro.ml.{RandomForest, Smote}
import scala.util.Random

/** Active-learning comparator (AL-RF / AL-RF-S, paper §5.1): a random
  * forest over Magellan-style features with uncertainty sampling, querying
  * ground-truth labels in batches — the modAL default strategy. AL-RF-S
  * additionally applies SMOTE to the labeled pool before each refit.
  */
object ActiveLearning {

  final case class Step(labelsUsed: Int, f1: Double)
  final case class RunResult(steps: Vector[Step]) {
    /** Smallest label count whose F1 reaches `target` (paper Table 5). */
    def labelsToReach(target: Double): Option[Int] =
      steps.find(_.f1 >= target).map(_.labelsUsed)
    def finalF1: Double = steps.lastOption.map(_.f1).getOrElse(0.0)
  }

  /** Runs the AL loop. `truth(i)` is the GT label of pair i (the oracle
    * being queried); F1 is evaluated over all pairs with `evalTruth` —
    * pairs outside the labeled pool are scored by the current model.
    * `warmStart` optionally seeds the labeled pool with (features, label)
    * rows from a source dataset (the Table 10 transfer setting).
    */
  def run(features: Array[Array[Double]], truth: Array[Int],
          evalF1: Array[Double] => Double,
          batch: Int = 20, initSeed: Int = 20, maxLabels: Int = 2000,
          useSmote: Boolean = false, seed: Long = 0,
          warmStart: Option[(Array[Array[Double]], Array[Int])] = None): RunResult = {
    val n = features.length
    val rng = new Random(seed)
    val labeled = scala.collection.mutable.LinkedHashSet.empty[Int]
    // Seed: random sample, forced to contain both classes if possible.
    val posIdx = truth.indices.filter(truth(_) == 1)
    val negIdx = truth.indices.filter(truth(_) == 0)
    rng.shuffle(truth.indices.toVector).take(initSeed).foreach(labeled += _)
    if (posIdx.nonEmpty && !labeled.exists(truth(_) == 1)) labeled += posIdx(rng.nextInt(posIdx.size))
    if (negIdx.nonEmpty && !labeled.exists(truth(_) == 0)) labeled += negIdx(rng.nextInt(negIdx.size))

    val steps = Vector.newBuilder[Step]
    var done = false
    while (!done) {
      val idx = labeled.toArray
      var xs = idx.map(features) ++ warmStart.map(_._1).getOrElse(Array.empty[Array[Double]])
      var ys = idx.map(truth) ++ warmStart.map(_._2).getOrElse(Array.empty[Int])
      if (useSmote) { val (bx, by) = Smote.balance(xs, ys, seed = seed); xs = bx; ys = by }
      val gamma: Array[Double] =
        if (ys.distinct.length < 2) Array.fill(n)(0.0)
        else {
          val model = RandomForest.fit(xs, ys,
            RandomForest.Params(numTrees = 20, maxDepth = 6), seed = seed + labeled.size)
          features.map(model.predictProba)
        }
      steps += Step(labeled.size, evalF1(gamma))

      if (labeled.size >= math.min(maxLabels, n)) done = true
      else {
        // Uncertainty sampling: closest to the decision boundary first.
        val candidates = (0 until n).filterNot(labeled.contains)
          .sortBy(i => math.abs(gamma(i) - 0.5))
          .take(batch)
        if (candidates.isEmpty) done = true else candidates.foreach(labeled += _)
      }
    }
    RunResult(steps.result())
  }
}
