package repro.zeroer

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class ZeroErSpec extends AnyFunSuite {

  /** 12-dim feature rows shaped like Features.featureCols: matches have high
    * jaccard (idx 0) and model equality (idx 4).
    */
  private def fixture(n: Int, posRate: Double, seed: Long) = {
    val rng = new Random(seed)
    val truth = Array.fill(n)(if (rng.nextDouble() < posRate) 1 else 0)
    val feats = truth.map { y =>
      val base = if (y == 1) 0.75 else 0.15
      Array(
        math.min(1.0, math.max(0.0, base + rng.nextGaussian() * 0.1)), // jaccard
        math.min(1.0, math.max(0.0, base + rng.nextGaussian() * 0.12)), // containment
        if (y == 1) 3.0 + rng.nextInt(3) else rng.nextInt(2).toDouble, // common
        0.8, // lenratio
        if (y == 1 && rng.nextDouble() < 0.8) 1.0 else if (y == 0 && rng.nextDouble() < 0.9) 0.0 else -1.0, // model eq
        1.0, // brand eq
        if (y == 1) 0.02 else 0.5, 1.0, // price
        1.0, 1.0, // size
        0.0, 1.0) // year
    }
    (feats, truth)
  }

  test("ZeroER separates an easy mixture") {
    val (feats, truth) = fixture(600, 0.15, 0)
    val g = ZeroEr.fitPredict(feats)
    val pred = g.map(p => if (p >= 0.5) 1 else 0)
    val (f1, _) = repro.core.Metrics.binary(pred, truth)
    assert(f1 > 0.7, s"F1 $f1")
  }

  test("posteriors are probabilities") {
    val (feats, _) = fixture(200, 0.2, 1)
    assert(ZeroEr.fitPredict(feats).forall(p => p >= 0 && p <= 1))
  }

  test("deterministic in seed") {
    val (feats, _) = fixture(200, 0.2, 2)
    assert(ZeroEr.fitPredict(feats, seed = 3).sameElements(ZeroEr.fitPredict(feats, seed = 3)))
  }

  test("withTransitivity two-table thins conflicting matches") {
    val pairs = Array((1L, 100L), (2L, 100L), (3L, 101L))
    val gamma = Array(0.9, 0.8, 0.9)
    val out = ZeroEr.withTransitivity(pairs, gamma, twoTable = true)
    assert(out.count(_ > 0.5) == 2) // one of the two right-100 pairs dropped
  }

  test("withTransitivity single-table reduces triangle violations") {
    val pairs = Array((1L, 2L), (1L, 3L), (2L, 3L))
    val gamma = Array(0.9, 0.9, 0.1)
    val out = ZeroEr.withTransitivity(pairs, gamma, twoTable = false)
    assert(out(0) * out(1) <= gamma(0) * gamma(1))
  }

  test("empty input yields empty output") {
    assert(ZeroEr.fitPredict(Array.empty).isEmpty)
  }
}
