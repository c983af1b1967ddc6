package repro.exp

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.core._
import repro.emdata.{Blocking, Datasets, EmDataGen, Features}
import repro.lf.{LabelingFunctions, LfSuite}
import repro.zeroer.ZeroEr

/** Prepares a dataset end-to-end (generate → block → LF votes → features)
  * and exposes the evaluation closure every experiment shares.
  */
object Runner {

  final case class Prepared(ds: EmDataGen.EmDataset,
                            pairDf: DataFrame,
                            pairs: Array[(Long, Long)],
                            votes: Array[Array[Int]],
                            feats: Array[Array[Double]],
                            textFeats: Array[Array[Double]],
                            truth: Array[Int],
                            lfs: Seq[LabelingFunctions.Lf]) {
    def cfg: EmDataGen.EmConfig = ds.cfg
    val candSet: Set[(Long, Long)] = pairs.toSet

    /** Predicted match set from soft labels (candidate pairs with γ ≥ 0.5),
      * restricted to the labeled scope on partial-GT datasets.
      */
    def predictedSet(gamma: Array[Double]): Set[(Long, Long)] = {
      val p = pairs.indices.collect { case i if gamma(i) >= 0.5 => pairs(i) }.toSet
      ds.evalScope match {
        case Some(scope) => p.intersect(scope)
        case None        => p
      }
    }

    /** F1 against ground truth. GT matches lost by blocking count as false
      * negatives — honest end-to-end scoring.
      */
    def f1(gamma: Array[Double]): Double = Metrics.f1(predictedSet(gamma), ds.evalTruth)
    def prf(gamma: Array[Double]): Metrics.Prf = Metrics.prf(predictedSet(gamma), ds.evalTruth)

    /** F1 for an explicit predicted pair set (postprocessing baselines). */
    def f1Of(predicted: Set[(Long, Long)]): Double = {
      val scoped = ds.evalScope.map(predicted.intersect).getOrElse(predicted)
      Metrics.f1(scoped, ds.evalTruth)
    }

    def blockingRecall: Double = Blocking.recall(candSet, ds.gt)
  }

  /** Generate + block + vote + featurize one dataset at `scale`. */
  def prepare(spark: SparkSession, cfg: EmDataGen.EmConfig, scale: Double,
              lfsOverride: Option[Seq[LabelingFunctions.Lf]] = None): Prepared = {
    val ds = EmDataGen.generate(spark, cfg, scale)
    val blocked = Blocking.block(spark, ds)
    val lfs = lfsOverride.getOrElse(LfSuite.suite(cfg.name))
    val (withVotes, voteCols) = LabelingFunctions.withVotes(blocked, lfs)
    val full = Features.withFeatures(withVotes).cache()
    val rows = full.select(
      (Seq("id1", "id2") ++ voteCols ++ Features.featureCols).map(org.apache.spark.sql.functions.col): _*
    ).collect()
    val pairs = rows.map(r => (r.getLong(0), r.getLong(1)))
    val votes = rows.map(r => Array.tabulate(voteCols.size)(i => r.getInt(i + 2)))
    val feats = rows.map(r =>
      Array.tabulate(Features.featureCols.size)(i => r.getDouble(i + 2 + voteCols.size)))
    val textIdx = Features.textFeatureCols.map(Features.featureCols.indexOf)
    val textFeats = feats.map(f => textIdx.map(f).toArray)
    val truth = pairs.map(p => if (ds.gt.contains(p)) 1 else 0)
    Prepared(ds, full, pairs, votes, feats, textFeats, truth, lfs)
  }

  // ---- Method registry (Tables 3, 6, 8, 11) --------------------------------

  /** Weak-supervision baselines operating on the labeling matrix alone. */
  val wsBaselines: Seq[LabelModel] = Seq(MajorityVote, DawidSkene, Ebcc, FlyingSquid, SnorkelModel)

  /** SIMPLE-EM on a prepared dataset (detects duplicate-freeness itself). */
  def simpleEm(p: Prepared, seed: Long = 0): SimpleEm.Output =
    if (p.cfg.twoTable)
      SimpleEm.runTwoTable(p.votes, p.pairs, p.ds.nLeft, p.ds.nRight, seed)
    else
      SimpleEm.runSingleTable(p.votes, p.pairs, seed)

  /** ZeroER on a prepared dataset (its own features, no LFs). */
  def zeroEr(p: Prepared, seed: Long = 0): Array[Double] =
    ZeroEr.fitPredict(p.feats,
      jaccardIdx = Features.featureCols.indexOf("f_jaccard"),
      modelEqIdx = Features.featureCols.indexOf("f_model_eq"),
      seed = seed)
}
