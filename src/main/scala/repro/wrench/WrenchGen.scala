package repro.wrench

import scala.util.Random

/** Synthetic analogues of the ten WRENCH binary-classification weak
  * supervision datasets (paper Table 12; DESIGN.md substitution #9).
  *
  * Each spec mirrors the published dataset's shape: the LF count (4..83),
  * the metric (F1 for skewed datasets, accuracy for balanced ones), class
  * balance, rough LF accuracy/coverage ranges, and correlation structure
  * (LFs generated as noisy copies of a smaller set of independent "parents",
  * which is what breaks the conditional-independence baselines on the larger
  * suites). Ground truth is returned for evaluation only.
  */
object WrenchGen {

  final case class Spec(name: String, nLf: Int, metric: String, n: Int,
                        posRate: Double, accLo: Double, accHi: Double,
                        covLo: Double, covHi: Double, parents: Int,
                        seed: Long)

  /** The ten datasets of Table 12 (#LFs and metric from the paper). */
  val specs: Vector[Spec] = Vector(
    Spec("basketball", 4, "F1", 2000, 0.12, 0.55, 0.75, 0.15, 0.4, 4, 201),
    Spec("commercial", 4, "F1", 2000, 0.3, 0.75, 0.9, 0.5, 0.9, 4, 202),
    Spec("tennis",     6, "F1", 2000, 0.35, 0.7, 0.88, 0.4, 0.8, 6, 203),
    Spec("yelp",       8, "acc", 2500, 0.5, 0.6, 0.8, 0.3, 0.7, 5, 204),
    Spec("imdb",       8, "acc", 2500, 0.5, 0.6, 0.78, 0.3, 0.7, 5, 205),
    Spec("spouse",     9, "F1", 2500, 0.08, 0.55, 0.8, 0.1, 0.35, 6, 206),
    Spec("youtube",   10, "acc", 1600, 0.5, 0.6, 0.85, 0.2, 0.6, 6, 207),
    Spec("cdr",       33, "F1", 3000, 0.25, 0.6, 0.92, 0.05, 0.3, 6, 208),
    Spec("sms",       73, "F1", 3000, 0.13, 0.6, 0.95, 0.02, 0.2, 8, 209),
    Spec("census",    83, "F1", 3000, 0.24, 0.55, 0.9, 0.03, 0.25, 8, 210))

  final case class WrenchData(spec: Spec, votes: Array[Array[Int]], truth: Array[Int])

  /** Generate one dataset: y in {0,1}; votes in {-1,0,+1}. */
  def generate(spec: Spec): WrenchData = {
    val rng = new Random(spec.seed)
    val truth = Array.fill(spec.n)(if (rng.nextDouble() < spec.posRate) 1 else 0)
    // Real WRENCH LFs are mostly ONE-SIDED: a keyword/heuristic that fires a
    // single label or abstains, with wildly varying precision and coverage.
    // That is the regime where unweighted vote counting loses to models that
    // learn per-LF reliability. Parents are independent given y; parent 0 is
    // the noisiest AND fires the most (cheap spammy heuristic); precision
    // ramps up with the parent index.
    val quality = Array.tabulate(spec.parents) { p => // 0 = worst, 1 = best
      if (spec.parents == 1) 1.0 else p / (spec.parents - 1).toDouble
    }
    // Precise parents keep at least half the coverage range: their "veto"
    // votes must actually reach the rows the spammy block mislabels for the
    // interaction signal to exist.
    val fireRate = Array.tabulate(spec.parents) { p =>
      spec.covLo + (spec.covHi - spec.covLo) * (1.0 - 0.5 * quality(p))
    }
    // One-sided noise: how often the LF fires on the WRONG class, relative
    // to its on-class fire rate. Two-sided accuracy for the mixed parents.
    val sideNoise = Array.tabulate(spec.parents)(p => 0.85 - 0.8 * quality(p))
    val twoAcc    = Array.tabulate(spec.parents)(p => spec.accLo + (spec.accHi - spec.accLo) * quality(p))
    val polarity  = Array.tabulate(spec.parents)(p => if (p % 2 == 0) 1 else -1)
    val oneSided  = Array.tabulate(spec.parents) { p =>
      if (spec.metric == "F1") p % 5 != 4 // 80% one-sided on skewed suites
      else p % 2 == 0                     // 50% on the balanced acc suites
    }
    val parentVotes = Array.tabulate(spec.parents) { p =>
      Array.tabulate(spec.n) { i =>
        val y = if (truth(i) == 1) 1 else -1
        if (oneSided(p)) {
          val onClass = y == polarity(p)
          val pFire = if (onClass) fireRate(p) else fireRate(p) * sideNoise(p)
          if (rng.nextDouble() < pFire) polarity(p) else 0
        } else {
          if (rng.nextDouble() >= fireRate(p)) 0
          else if (rng.nextDouble() < twoAcc(p)) y else -y
        }
      }
    }
    // Children are tightly-correlated noisy copies of a parent, concentrated
    // on the NOISY parents (half of all children copy parent 0). Vote
    // counting and conditional-independence models over-count such a block
    // as independent evidence; an interaction-aware model collapses it — the
    // paper's explanation for SIMPLE's edge on the LF-rich suites.
    val votes = Array.tabulate(spec.n)(_ => Array.ofDim[Int](spec.nLf))
    for (j <- 0 until spec.nLf) {
      val p =
        if (j < spec.parents) j
        else if (rng.nextDouble() < 0.7) 0
        else rng.nextInt(spec.parents)
      val flip = if (j < spec.parents) 0.0 else rng.nextDouble() * 0.03
      val dropout = if (j < spec.parents) 0.0 else rng.nextDouble() * 0.2
      for (i <- 0 until spec.n) {
        val v = parentVotes(p)(i)
        votes(i)(j) =
          if (v == 0 || rng.nextDouble() < dropout) 0
          else if (rng.nextDouble() < flip) -v
          else v
      }
    }
    WrenchData(spec, votes, truth)
  }
}
