package repro.core

/** FlyingSquid (Fu et al., ICML 2020): closed-form accuracy estimation via
  * the triplet method — no iterative EM.
  *
  * For LFs i, j, k that are conditionally independent given y (votes in ±1):
  * E[λ_i λ_j] = a_i a_j with a_i = E[λ_i y], so
  * |a_i| = sqrt(|E[λ_i λ_j] E[λ_i λ_k] / E[λ_j λ_k]|). Accuracies are the
  * median over all triplets; signs come from correlation with majority vote
  * (the standard better-than-random assumption). Labels are then aggregated
  * by a naive-Bayes vote with the MV-derived class prior. Abstentions are
  * conditioned away: moments use only rows where both LFs voted.
  */
object FlyingSquid extends LabelModel {
  val name = "FS"

  def fitPredict(votes: Array[Array[Int]], seed: Long = 0L): Array[Double] = {
    val n = votes.length
    if (n == 0) return Array.empty
    val m = votes(0).length
    val p1 = MajorityVote.classPrior(votes)
    val mv = MajorityVote.fitPredict(votes).map(g => if (g >= 0.5) 1 else -1)

    // Pairwise second moments over mutually non-abstaining rows.
    val moment = Array.fill(m, m)(0.0)
    for (a <- 0 until m; b <- 0 until m if a != b) {
      var s = 0.0; var c = 0
      var i = 0
      while (i < n) {
        val va = votes(i)(a); val vb = votes(i)(b)
        if (va != 0 && vb != 0) { s += va * vb; c += 1 }
        i += 1
      }
      moment(a)(b) = if (c < 5) 0.0 else s / c
    }

    // Triplet estimates, median-aggregated per LF.
    val acc = Array.tabulate(m) { a =>
      val ests = for {
        b <- 0 until m if b != a
        c <- 0 until m if c != a && c != b
        if math.abs(moment(b)(c)) > 1e-3
      } yield math.sqrt(math.min(1.0, math.abs(moment(a)(b) * moment(a)(c) / moment(b)(c))))
      val mag =
        if (ests.isEmpty) 0.2
        else { val s = ests.sorted; s(s.length / 2) }
      // Sign from agreement with majority vote on non-abstain rows.
      var agree = 0.0; var cnt = 0
      var i = 0
      while (i < n) {
        if (votes(i)(a) != 0) { agree += votes(i)(a) * mv(i); cnt += 1 }
        i += 1
      }
      val sign = if (cnt == 0 || agree >= 0) 1.0 else -1.0
      sign * math.min(0.98, math.max(0.02, mag))
    }

    // Naive-Bayes aggregation: P(λ = y | λ != 0) = (1 + a) / 2.
    Array.tabulate(n) { i =>
      var l1 = math.log(p1); var l0 = math.log(1 - p1)
      var j = 0
      while (j < m) {
        val v = votes(i)(j)
        if (v != 0) {
          val pAgree = (1.0 + acc(j)) / 2.0
          val pPos = if (v == 1) pAgree else 1 - pAgree
          val pNeg = if (v == -1) pAgree else 1 - pAgree
          l1 += math.log(math.max(1e-9, pPos))
          l0 += math.log(math.max(1e-9, pNeg))
        }
        j += 1
      }
      val mx = math.max(l0, l1)
      val e1 = math.exp(l1 - mx); val e0 = math.exp(l0 - mx)
      e1 / (e0 + e1)
    }
  }
}
