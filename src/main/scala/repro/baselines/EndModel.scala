package repro.baselines

import repro.ml.{RandomForest, Smote}
import scala.util.Random

/** DeepMatcher end-model substitute (DESIGN.md substitution #7, Table 7).
  *
  * A supervised classifier over the full similarity feature set, standing in
  * for the DeepMatcher network. It is trained either on weak labels produced
  * by SIMPLE-EM or on ground-truth labels (with a sweep over the GT label
  * budget), and always evaluated on the held-out test split with GT labels —
  * exactly the roles measured in the paper's Table 7.
  */
object EndModel {

  final case class Splits(train: Array[Int], valid: Array[Int], test: Array[Int])

  /** Random 3:1:1 split of pair indices. */
  def split(n: Int, seed: Long): Splits = {
    val perm = new Random(seed).shuffle((0 until n).toVector)
    Splits(perm.take(3 * n / 5).toArray,
           perm.slice(3 * n / 5, 4 * n / 5).toArray,
           perm.drop(4 * n / 5).toArray)
  }

  /** Train on `labels` over the train split, return F1 on the test split
    * against `truth`.
    */
  def trainEval(features: Array[Array[Double]], labels: Array[Int], truth: Array[Int],
                splits: Splits, seed: Long = 0): Double = {
    val trX0 = splits.train.map(features); val trY0 = splits.train.map(labels)
    if (trY0.distinct.length < 2 || splits.test.isEmpty) return 0.0
    val (trX, trY) = Smote.balance(trX0, trY0, seed = seed)
    val model = RandomForest.fit(trX, trY, RandomForest.Params(numTrees = 30, maxDepth = 8), seed)
    val pred = splits.test.map(i => model.predict(features(i)))
    repro.core.Metrics.binary(pred, splits.test.map(truth))._1
  }

  /** Sweep GT-label budgets over the train split; returns (budget, testF1)
    * per step — used to find how many GT labels match the weak-label end
    * model and where F1 converges.
    */
  def gtSweep(features: Array[Array[Double]], truth: Array[Int], splits: Splits,
              budgets: Seq[Int], seed: Long = 0): Seq[(Int, Double)] = {
    val rng = new Random(seed)
    val order = rng.shuffle(splits.train.toVector)
    budgets.filter(_ <= order.size).map { b =>
      val sub = Splits(order.take(b).toArray, splits.valid, splits.test)
      b -> trainEval(features, truth, truth, sub, seed)
    }
  }
}
