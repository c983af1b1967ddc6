package repro.core

/** Majority vote: the most common non-abstain label per pair.
  *
  * Ties (including all-abstain rows) are resolved to the non-match side —
  * the majority class in EM candidate sets — with a soft label just below
  * 0.5 so downstream consumers can distinguish "tie" from "confident
  * non-match".
  */
object MajorityVote extends LabelModel {
  val name = "MV"

  def fitPredict(votes: Array[Array[Int]], seed: Long = 0L): Array[Double] =
    votes.map { row =>
      val s = row.sum
      if (s > 0) 1.0 else if (s < 0) 0.0 else 0.45
    }

  /** Class prior (fraction of predicted matches) — used by models that need
    * a class-balance estimate (Snorkel-style, FlyingSquid), per the paper's
    * setup ("we obtain the class weights by counting ... from Majority
    * Vote").
    */
  def classPrior(votes: Array[Array[Int]]): Double = {
    val g = fitPredict(votes)
    math.min(0.95, math.max(0.01, g.count(_ >= 0.5).toDouble / math.max(1, g.length)))
  }
}
