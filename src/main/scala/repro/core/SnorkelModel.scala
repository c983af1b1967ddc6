package repro.core

/** Snorkel-style generative label model.
  *
  * The data-programming generative model (Ratner et al., 2016/2017): each LF
  * j has a propensity β_j = P(λ_j ≠ 0) and an accuracy α_j = P(λ_j = y | λ_j
  * ≠ 0); votes are conditionally independent given y. Parameters are learned
  * by EM on the marginal likelihood; the class prior is fixed from majority-
  * vote counts (the class-weight handling the paper describes for Snorkel in
  * its experimental setup).
  */
object SnorkelModel extends LabelModel {
  val name = "SN"

  def fitPredict(votes: Array[Array[Int]], seed: Long = 0L): Array[Double] = {
    val n = votes.length
    if (n == 0) return Array.empty
    val m = votes(0).length
    val p1 = MajorityVote.classPrior(votes)

    // Propensities are observable directly.
    val beta = Array.tabulate(m) { j =>
      math.min(0.999, math.max(1e-3, votes.count(_(j) != 0).toDouble / n))
    }
    var alpha = Array.fill(m)(0.7) // better-than-random init (weak-supervision assumption)
    var mu = MajorityVote.fitPredict(votes)

    var iter = 0
    var converged = false
    while (iter < 100 && !converged) {
      // E-step with current accuracies.
      val next = Array.ofDim[Double](n)
      var i = 0
      while (i < n) {
        var l1 = math.log(p1); var l0 = math.log(1 - p1)
        var j = 0
        while (j < m) {
          val v = votes(i)(j)
          if (v != 0) {
            // y = +1 => vote +1 w.p. alpha, -1 w.p. 1-alpha (and symmetric).
            val pPos = if (v == 1) alpha(j) else 1 - alpha(j)
            val pNeg = if (v == -1) alpha(j) else 1 - alpha(j)
            l1 += math.log(math.max(1e-9, beta(j) * pPos))
            l0 += math.log(math.max(1e-9, beta(j) * pNeg))
          }
          j += 1
        }
        val mx = math.max(l0, l1)
        val e1 = math.exp(l1 - mx); val e0 = math.exp(l0 - mx)
        next(i) = e1 / (e0 + e1)
        i += 1
      }
      val delta = next.zip(mu).map { case (a, b) => math.abs(a - b) }.sum / n
      mu = next
      // M-step: accuracy = expected fraction of non-abstain votes agreeing with y.
      val agree = Array.fill(m)(1.0); val total = Array.fill(m)(2.0) // Laplace
      i = 0
      while (i < n) {
        var j = 0
        while (j < m) {
          val v = votes(i)(j)
          if (v != 0) {
            total(j) += 1
            agree(j) += (if (v == 1) mu(i) else 1.0 - mu(i))
          }
          j += 1
        }
        i += 1
      }
      alpha = Array.tabulate(m)(j => math.min(0.999, math.max(1e-3, agree(j) / total(j))))
      converged = delta < 1e-6
      iter += 1
    }
    mu
  }
}
