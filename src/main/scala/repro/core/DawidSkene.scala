package repro.core

/** Dawid & Skene (1979): per-LF confusion matrices learned by EM.
  *
  * Each LF j emits a symbol in {-1, 0, +1}; its behaviour is modeled by a
  * confusion table π_j[class][symbol] (abstention is an emission, so
  * LF coverage is part of the model). EM alternates:
  *   E-step: posterior P(y_i = +1 | row_i) from current π and class prior;
  *   M-step: re-estimate π and the prior from the posteriors
  * with Laplace smoothing. Initialized from majority vote (paper §3.1).
  */
object DawidSkene extends LabelModel {
  val name = "D&S"

  private val Classes = 2                      // 0 -> y=-1, 1 -> y=+1
  private def sym(v: Int): Int = v + 1         // -1/0/+1 -> 0/1/2

  def fitPredict(votes: Array[Array[Int]], seed: Long = 0L): Array[Double] = {
    val n = votes.length
    if (n == 0) return Array.empty
    val m = votes(0).length
    var mu = MajorityVote.fitPredict(votes)    // P(y_i = +1)
    var iter = 0
    var prev = mu
    var converged = false
    while (iter < 100 && !converged) {
      // M-step: confusion tables + prior with Laplace smoothing.
      val pi = Array.fill(m, Classes, 3)(1.0)  // smoothing pseudo-count
      val prior = Array.fill(Classes)(1.0)
      var i = 0
      while (i < n) {
        val w1 = mu(i); val w0 = 1.0 - mu(i)
        prior(1) += w1; prior(0) += w0
        var j = 0
        while (j < m) {
          val s = sym(votes(i)(j))
          pi(j)(1)(s) += w1
          pi(j)(0)(s) += w0
          j += 1
        }
        i += 1
      }
      val priorSum = prior.sum
      for (j <- 0 until m; c <- 0 until Classes) {
        val tot = pi(j)(c).sum
        var s = 0
        while (s < 3) { pi(j)(c)(s) /= tot; s += 1 }
      }
      // E-step.
      val next = Array.ofDim[Double](n)
      i = 0
      while (i < n) {
        var l1 = math.log(prior(1) / priorSum)
        var l0 = math.log(prior(0) / priorSum)
        var j = 0
        while (j < m) {
          val s = sym(votes(i)(j))
          l1 += math.log(pi(j)(1)(s))
          l0 += math.log(pi(j)(0)(s))
          j += 1
        }
        val mx = math.max(l0, l1)
        val e1 = math.exp(l1 - mx); val e0 = math.exp(l0 - mx)
        next(i) = e1 / (e0 + e1)
        i += 1
      }
      val delta = next.zip(prev).map { case (a, b) => math.abs(a - b) }.sum / n
      prev = next
      mu = next
      converged = delta < 1e-6
      iter += 1
    }
    mu
  }
}
