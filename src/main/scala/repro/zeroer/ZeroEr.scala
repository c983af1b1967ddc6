package repro.zeroer

import repro.core.Transitivity
import repro.ml.Gmm

/** ZeroER (Wu et al., SIGMOD 2020) — the unsupervised EM baseline.
  *
  * Tailors a 2-component Gaussian mixture to EM over Magellan-style
  * similarity features: the match component is seeded from the most
  * confident similarity evidence (equal model tokens, else top-similarity
  * quantile), then EM refines both components; P(match|x) is the posterior
  * of the match component. The `withTransitivity` variant applies ZeroER's
  * greedy per-triplet projection (the "ZeroER Trans" row of Table 8).
  */
object ZeroEr {

  /** P(match) per pair given feature vectors (ordering matches `features`).
    * `jaccardIdx`/`modelEqIdx` locate the seeding features.
    */
  def fitPredict(features: Array[Array[Double]],
                 jaccardIdx: Int = 0, modelEqIdx: Int = 4,
                 seed: Long = 0): Array[Double] = {
    val n = features.length
    if (n == 0) return Array.empty
    // Seed responsibilities: model-token equality is near-certain evidence;
    // otherwise use the top-q jaccard quantile, q from the model-eq rate.
    val modelEqRate = features.count(_(modelEqIdx) == 1.0).toDouble / n
    val q = math.min(0.5, math.max(0.02, modelEqRate))
    val jacs = features.map(_(jaccardIdx)).sorted
    val cut = jacs(math.min(n - 1, ((1 - q) * n).toInt))
    val init = features.map { f =>
      if (f(modelEqIdx) == 1.0) 0.95
      else if (f(jaccardIdx) >= cut && cut > 0) 0.7
      else 0.05
    }
    val model = Gmm.fit(features, init, iters = 80, seed = seed)
    features.map(model.posterior)
  }

  /** ZeroER with its transitivity heuristic applied to the posteriors. */
  def withTransitivity(pairs: Array[(Long, Long)], gamma: Array[Double],
                       twoTable: Boolean): Array[Double] =
    if (twoTable) Transitivity.zeroErGreedy(pairs, gamma)
    else Transitivity.zeroErGreedySingle(pairs, gamma)
}
