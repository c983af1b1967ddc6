package repro.baselines

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class BaselinesSpec extends AnyFunSuite {

  /** Separable feature fixture: positives near (1,1), negatives near (0,0). */
  private def fixture(n: Int, posRate: Double, noise: Double, seed: Long) = {
    val rng = new Random(seed)
    val truth = Array.fill(n)(if (rng.nextDouble() < posRate) 1 else 0)
    val feats = truth.map { y =>
      val c = y.toDouble
      Array(c + rng.nextGaussian() * noise, c + rng.nextGaussian() * noise)
    }
    (feats, truth)
  }

  private def setF1(gamma: Array[Double], truth: Array[Int]): Double = {
    val pred = gamma.map(g => if (g >= 0.5) 1 else 0)
    repro.core.Metrics.binary(pred, truth)._1
  }

  test("active learning improves with more labels on separable data") {
    val (feats, truth) = fixture(400, 0.2, 0.3, 0)
    val r = ActiveLearning.run(feats, truth, g => setF1(g, truth),
      batch = 20, initSeed = 10, maxLabels = 200, seed = 0)
    assert(r.steps.nonEmpty)
    assert(r.finalF1 > r.steps.head.f1 - 0.05)
    assert(r.finalF1 > 0.8)
  }

  test("active learning respects the label budget") {
    val (feats, truth) = fixture(300, 0.3, 0.3, 1)
    val r = ActiveLearning.run(feats, truth, g => setF1(g, truth),
      batch = 25, maxLabels = 100, seed = 0)
    assert(r.steps.last.labelsUsed <= 100 + 25)
  }

  test("labelsToReach finds the first step meeting a target") {
    val (feats, truth) = fixture(400, 0.25, 0.2, 2)
    val r = ActiveLearning.run(feats, truth, g => setF1(g, truth),
      batch = 20, maxLabels = 200, seed = 0)
    val k = r.labelsToReach(0.5)
    assert(k.isDefined && k.get <= 200 + 20)
    assert(r.labelsToReach(1.1).isEmpty)
  }

  test("SMOTE variant runs and reaches comparable F1") {
    val (feats, truth) = fixture(400, 0.1, 0.3, 3)
    val r = ActiveLearning.run(feats, truth, g => setF1(g, truth),
      batch = 20, maxLabels = 150, useSmote = true, seed = 0)
    assert(r.finalF1 > 0.6)
  }

  test("warm start with source labels speeds up or matches cold start") {
    val (srcF, srcT) = fixture(300, 0.25, 0.3, 4)
    val (tgtF, tgtT) = fixture(300, 0.25, 0.3, 5)
    val cold = ActiveLearning.run(tgtF, tgtT, g => setF1(g, tgtT), batch = 20, maxLabels = 120, seed = 0)
    val warm = ActiveLearning.run(tgtF, tgtT, g => setF1(g, tgtT), batch = 20, maxLabels = 120, seed = 0,
      warmStart = Some((srcF, srcT)))
    // Same-distribution source data: warm start's first step should not be
    // drastically worse than cold start's last.
    assert(warm.steps.head.f1 > cold.steps.last.f1 - 0.3)
  }

  test("DittoSim separates an easy dataset on the held-out split") {
    val (feats, truth) = fixture(500, 0.3, 0.2, 6)
    val r = DittoSim.run(feats, truth, seed = 0)
    assert(r.testF1 > 0.8)
  }

  test("DittoSim returns 0 on degenerate single-class data") {
    val feats = Array.fill(50)(Array(1.0, 1.0))
    val truth = Array.fill(50)(0)
    assert(DittoSim.run(feats, truth).testF1 == 0.0)
  }

  test("EndModel split is a 3:1:1 partition") {
    val s = EndModel.split(100, 0)
    assert(s.train.length == 60 && s.valid.length == 20 && s.test.length == 20)
    assert((s.train ++ s.valid ++ s.test).distinct.length == 100)
  }

  test("EndModel trained on GT labels reaches high F1 on separable data") {
    val (feats, truth) = fixture(500, 0.3, 0.2, 7)
    val s = EndModel.split(feats.length, 1)
    val f1 = EndModel.trainEval(feats, truth, truth, s, seed = 0)
    assert(f1 > 0.85)
  }

  test("EndModel on noisy weak labels still learns when noise is mild") {
    val (feats, truth) = fixture(500, 0.3, 0.2, 8)
    val rng = new Random(9)
    val weak = truth.map(y => if (rng.nextDouble() < 0.1) 1 - y else y)
    val s = EndModel.split(feats.length, 1)
    val f1 = EndModel.trainEval(feats, weak, truth, s, seed = 0)
    assert(f1 > 0.7)
  }

  test("EndModel GT sweep is monotone-ish: more labels never collapses F1") {
    val (feats, truth) = fixture(600, 0.3, 0.25, 10)
    val s = EndModel.split(feats.length, 2)
    val sweep = EndModel.gtSweep(feats, truth, s, Seq(20, 80, 320), seed = 0)
    assert(sweep.size == 3)
    assert(sweep.last._2 >= sweep.head._2 - 0.15)
  }
}
