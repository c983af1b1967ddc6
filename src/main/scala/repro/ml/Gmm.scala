package repro.ml

import scala.util.Random

/** Two-component diagonal-covariance Gaussian mixture fitted by EM.
  *
  * Substrate for the ZeroER baseline (Wu et al., SIGMOD 2020): one component
  * models the match class, the other the non-match class, over Magellan-style
  * similarity features. Component 1 is anchored as the "match" component by
  * initializing it on the highest-similarity points.
  */
object Gmm {

  final case class Model(weight: Array[Double],          // component priors, length 2
                         mean: Array[Array[Double]],     // 2 x d
                         variance: Array[Array[Double]]) // 2 x d (diagonal)
  {
    def logDensity(c: Int, x: Array[Double]): Double = {
      var s = 0.0; var j = 0
      while (j < x.length) {
        val v = variance(c)(j)
        val d = x(j) - mean(c)(j)
        s += -0.5 * (math.log(2 * math.Pi * v) + d * d / v)
        j += 1
      }
      s
    }
    /** P(match | x): posterior of component 1. */
    def posterior(x: Array[Double]): Double = {
      val l0 = math.log(weight(0)) + logDensity(0, x)
      val l1 = math.log(weight(1)) + logDensity(1, x)
      val m  = math.max(l0, l1)
      val e0 = math.exp(l0 - m); val e1 = math.exp(l1 - m)
      e1 / (e0 + e1)
    }
  }

  private val MinVar = 1e-4

  /** Fit by EM. `initResp` gives the initial P(component 1) per row. */
  def fit(xs: Array[Array[Double]], initResp: Array[Double],
          iters: Int = 60, seed: Long = 0): Model = {
    require(xs.nonEmpty)
    val n = xs.length; val d = xs(0).length
    val rng  = new Random(seed)
    var resp = initResp.map(r => math.min(0.999, math.max(0.001, r + (rng.nextDouble() - 0.5) * 1e-3)))
    var model: Model = null

    def mStep(): Model = {
      val w  = Array.ofDim[Double](2)
      val mu = Array.fill(2)(Array.ofDim[Double](d))
      val va = Array.fill(2)(Array.ofDim[Double](d))
      val tot = Array(resp.map(1.0 - _).sum + 1e-9, resp.sum + 1e-9)
      for (i <- 0 until n; c <- 0 to 1) {
        val r = if (c == 1) resp(i) else 1.0 - resp(i)
        var j = 0
        while (j < d) { mu(c)(j) += r * xs(i)(j); j += 1 }
      }
      for (c <- 0 to 1; j <- 0 until d) mu(c)(j) /= tot(c)
      for (i <- 0 until n; c <- 0 to 1) {
        val r = if (c == 1) resp(i) else 1.0 - resp(i)
        var j = 0
        while (j < d) { val dd = xs(i)(j) - mu(c)(j); va(c)(j) += r * dd * dd; j += 1 }
      }
      for (c <- 0 to 1; j <- 0 until d) va(c)(j) = math.max(MinVar, va(c)(j) / tot(c))
      w(0) = tot(0) / n; w(1) = tot(1) / n
      Model(w, mu, va)
    }

    var it = 0
    while (it < iters) {
      model = mStep()
      val next = xs.map(model.posterior)
      val delta = next.zip(resp).map { case (a, b) => math.abs(a - b) }.sum / n
      resp = next
      it += 1
      if (delta < 1e-6) it = iters
    }
    if (model == null) model = mStep()
    model
  }
}
