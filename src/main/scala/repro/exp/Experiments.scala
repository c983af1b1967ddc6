package repro.exp

import org.apache.spark.sql.SparkSession
import repro.baselines.{ActiveLearning, DittoSim, EndModel}
import repro.core._
import repro.emdata.{Datasets, EmDataGen, Features}
import repro.lf.LfSuite
import repro.wrench.WrenchGen
import repro.zeroer.ZeroEr
import TableFmt.{Table, f => ff, pct}

import scala.collection.mutable
import scala.util.Random

/** One function per reproduced evaluation table. Every function returns a
  * printable [[TableFmt.Table]]; bench suites assert on the underlying
  * numbers and print the rendered table (tee'd into bench_output.txt).
  *
  * Prepared datasets and SIMPLE/SIMPLE-EM outputs are memoized per
  * (dataset, scale) within the JVM, since several tables share them.
  */
final class Experiments(spark: SparkSession, val scale: Double) {

  private val preparedCache = mutable.Map.empty[String, Runner.Prepared]
  private val simpleCache   = mutable.Map.empty[String, Array[Double]]
  private val simpleEmCache = mutable.Map.empty[String, SimpleEm.Output]

  def prepared(name: String): Runner.Prepared =
    preparedCache.getOrElseUpdate(name, Runner.prepare(spark, Datasets.byName(name), scale))

  def simpleGamma(name: String): Array[Double] =
    simpleCache.getOrElseUpdate(name, Simple.fitPredict(prepared(name).votes, seed = 0))

  def simpleEmOut(name: String): SimpleEm.Output =
    simpleEmCache.getOrElseUpdate(name, Runner.simpleEm(prepared(name), seed = 0))

  private def names: Seq[String] = Datasets.all.map(_.name)

  private def avg(xs: Seq[Double]): Double = if (xs.isEmpty) 0.0 else xs.sum / xs.size

  // --- Table 1: benchmark dataset statistics -------------------------------

  def table1(): Table = {
    val rows = names.map { n =>
      val p = prepared(n)
      val nm = p.ds.gt.size
      val tuples = if (p.cfg.twoTable) s"${p.ds.nLeft}, ${p.ds.nRight}" else s"${p.ds.nLeft}"
      val labeled = p.ds.partial.map { case (m, nn) => s"${m.size}, ${nn.size}" }.getOrElse(s"$nm, -")
      Seq(n, tuples, labeled, "6", p.pairs.length.toString, ff(p.blockingRecall))
    }
    Table("Table 1: dataset statistics (synthetic analogues)",
      Seq("dataset", "# tuples L,R", "N_M, N_Non", "# attr", "candset size", "recall"), rows)
  }

  // --- Table 2: LF development effort --------------------------------------

  def table2(): Table = {
    val rows = names.map { n =>
      val lfs = prepared(n).lfs
      val paperMin = LfSuite.paperMinutes(n)
      Seq(n, lfs.size.toString, lfs.count(_.isNew).toString, s"$paperMin (paper; human effort N/A offline)")
    }
    Table("Table 2: LF development effort",
      Seq("dataset", "# of LFs", "# of new LFs", "time spent, minutes"), rows)
  }

  // --- Table 3: overall labeling performance -------------------------------

  def table3(): Table = {
    val header = Seq("dataset", "SIMPLE-EM", "MV", "D&S", "EBCC", "FS", "SN", "ZE")
    val scores = names.map { n =>
      val p = prepared(n)
      val em = p.f1(simpleEmOut(n).gamma)
      val base = Runner.wsBaselines.map(m => p.f1(m.fitPredict(p.votes, seed = 0)))
      val ze = p.f1(Runner.zeroEr(p))
      n -> (em +: base :+ ze)
    }
    val rows = scores.map { case (n, s) => n +: s.map(ff) } :+
      ("Avg." +: (0 until header.size - 1).map(i => ff(avg(scores.map(_._2(i))))))
    Table("Table 3: F1 of weak/unsupervised methods", header, rows)
  }

  /** Raw Table 3 scores for assertions: dataset -> method -> F1. */
  def table3Scores(): Map[String, Map[String, Double]] = {
    val methods = Seq("SIMPLE-EM", "MV", "D&S", "EBCC", "FS", "SN", "ZE")
    names.map { n =>
      val p = prepared(n)
      val em = p.f1(simpleEmOut(n).gamma)
      val base = Runner.wsBaselines.map(m => p.f1(m.fitPredict(p.votes, seed = 0)))
      val ze = p.f1(Runner.zeroEr(p))
      n -> methods.zip(em +: base :+ ze).toMap
    }.toMap
  }

  // --- Table 4: comparison to Ditto ----------------------------------------

  def table4(): Table = {
    val rows1 = mutable.ArrayBuffer[String]("SIMPLE-EM")
    val rows2 = mutable.ArrayBuffer[String]("DittoSim")
    names.foreach { n =>
      val p = prepared(n)
      rows1 += ff(p.f1(simpleEmOut(n).gamma))
      rows2 += ff(DittoSim.run(p.textFeats, p.truth, seed = 0).testF1)
    }
    Table("Table 4: SIMPLE-EM vs Ditto substitute (F1)",
      "method" +: names, Seq(rows1.toSeq, rows2.toSeq))
  }

  // --- Table 5: comparison to active learning ------------------------------

  /** Full-GT datasets only (paper excludes IR/YY/ABN). */
  val table5Datasets: Seq[String] = Seq("FZ", "DA", "DS", "AB", "AG", "WA", "M", "C")

  def table5(maxLabels: Int = 1500): Table = {
    val rows = table5Datasets.map { n =>
      val p = prepared(n)
      val target = p.f1(simpleEmOut(n).gamma)
      def eval(gamma: Array[Double]): Double = p.f1(gamma)
      // Best of AL-RF and AL-RF-S, as in the paper.
      val runs = Seq(false, true).map { sm =>
        ActiveLearning.run(p.feats, p.truth, eval, batch = 25,
          maxLabels = math.min(maxLabels, p.pairs.length), useSmote = sm, seed = 0)
      }
      val reached = runs.flatMap(_.labelsToReach(target)).sorted.headOption
      // "AL queries all labels": RF trained on every candidate label.
      val allF1 = {
        val (bx, by) = repro.ml.Smote.balance(p.feats, p.truth, seed = 0)
        val m = repro.ml.RandomForest.fit(bx, by, repro.ml.RandomForest.Params(numTrees = 30, maxDepth = 8), 0)
        eval(p.feats.map(m.predictProba))
      }
      val (lbl, pctLbl, humanMin) = reached match {
        case Some(k) => (k.toString, pct(k.toDouble / p.pairs.length), ff(k * 3.0 / 60))
        case None    => ("-", "-", "-")
      }
      Seq(n, ff(target), lbl, pctLbl, humanMin, ff(allF1), p.pairs.length.toString)
    }
    Table("Table 5: comparison to active learning",
      Seq("dataset", "SIMPLE-EM", "# labels to match", "% of labels", "human min", "F1 all labels", "# labels total"),
      rows)
  }

  // --- Table 6: running time ------------------------------------------------

  def table6(): Table = {
    def time[A](a: => A): Double = {
      val t0 = System.nanoTime(); a; (System.nanoTime() - t0) / 1e9
    }
    val header = Seq("dataset", "SIMPLE-EM", "MV", "D&S", "EBCC", "FS", "SN", "ZE", "AL-RF", "DittoSim")
    val all = names.map { n =>
      val p = prepared(n)
      val tEm = time(Runner.simpleEm(p, seed = 1))
      val tWs = Runner.wsBaselines.map(m => time(m.fitPredict(p.votes, seed = 1)))
      val tZe = time(Runner.zeroEr(p, seed = 1))
      val tAl =
        if (table5Datasets.contains(n))
          time(ActiveLearning.run(p.feats, p.truth, _ => 0.0, batch = 50,
            maxLabels = math.min(400, p.pairs.length), seed = 1))
        else Double.NaN
      val tDitto = time(DittoSim.run(p.textFeats, p.truth, seed = 1))
      n -> (tEm +: tWs :+ tZe :+ tAl :+ tDitto)
    }
    def cell(d: Double) = if (d.isNaN) "-" else ff(d)
    val rows = all.map { case (n, ts) => n +: ts.map(cell) } :+
      ("Avg." +: (0 until header.size - 1).map(i => cell(avg(all.map(_._2(i)).filterNot(_.isNaN)))))
    Table("Table 6: running time (seconds, this reproduction)", header, rows)
  }

  // --- Table 7: end model on SIMPLE-EM labels vs GT labels ------------------

  def table7(): Table = {
    val budgets = Seq(25, 50, 100, 200, 400, 800, 1600, 3200, 6400, 12800)
    val rows = names.map { n =>
      val p = prepared(n)
      val splits = EndModel.split(p.pairs.length, seed = 0)
      val weakLabels = LabelModel.harden(simpleEmOut(n).gamma)
      val weakF1 = EndModel.trainEval(p.feats, weakLabels, p.truth, splits, seed = 0)
      val sweep = EndModel.gtSweep(p.feats, p.truth, splits, budgets, seed = 0)
      val toMatch = sweep.find(_._2 >= weakF1).map(_._1.toString).getOrElse("-")
      val converged = sweep.lastOption.map(_._2).getOrElse(0.0)
      val convergedAt = sweep.reverse
        .takeWhile { case (_, f1v) => f1v >= converged - 0.005 }
        .lastOption.map(_._1.toString).getOrElse("-")
      Seq(n, ff(weakF1), toMatch, ff(converged), convergedAt)
    }
    Table("Table 7: end model trained on SIMPLE-EM labels vs GT labels",
      Seq("dataset", "F1 on SIMPLE-EM labels", "# GT labels to match", "converged F1", "# GT labels at convergence"),
      rows)
  }

  // --- Table 8: transitivity handling ---------------------------------------

  def table8(): Table = {
    val header = Seq("dataset", "No trans", "SIMPLE-EM", "ZeroER Trans", "Postprocess")
    val all = names.map { n =>
      val p = prepared(n)
      val g0 = simpleGamma(n)
      val noTrans = p.f1(g0)
      val em = p.f1(simpleEmOut(n).gamma)
      val zeTrans = p.f1(ZeroEr.withTransitivity(p.pairs, g0, p.cfg.twoTable))
      val post =
        if (p.cfg.twoTable) p.f1(Transitivity.postprocessTwoTable(p.pairs, g0))
        else p.f1Of(Transitivity.postprocessSingleTable(p.pairs, g0))
      n -> Seq(noTrans, em, zeTrans, post)
    }
    val rows = all.map { case (n, s) => n +: s.map(ff) } :+
      ("Avg." +: (0 until 4).map(i => ff(avg(all.map(_._2(i))))))
    Table("Table 8: methods to handle transitivity (F1)", header, rows)
  }

  def table8Scores(): Map[String, Seq[Double]] = {
    names.map { n =>
      val p = prepared(n)
      val g0 = simpleGamma(n)
      n -> Seq(p.f1(g0), p.f1(simpleEmOut(n).gamma))
    }.toMap
  }

  // --- Table 9: injected transitivity violations ----------------------------

  /** Corrupt GT per the paper: pick a matched tuple; w.p. 0.6 drop one of
    * its true matches, else add a spurious match; repeat x*N_gt times.
    */
  private def corruptGt(gt: Set[(Long, Long)], allIds: IndexedSeq[Long],
                        x: Double, seed: Long): Set[(Long, Long)] = {
    val rng = new Random(seed)
    val cur = mutable.Set.empty[(Long, Long)] ++ gt
    val steps = (x * gt.size).toInt
    for (_ <- 0 until steps if cur.nonEmpty) {
      val matched = cur.toVector
      val (a, b) = matched(rng.nextInt(matched.size))
      val t = if (rng.nextBoolean()) a else b
      if (rng.nextDouble() < 0.6) {
        val inv = cur.filter(p => p._1 == t || p._2 == t)
        if (inv.nonEmpty) cur -= inv.toVector(rng.nextInt(inv.size))
      } else {
        val other = allIds(rng.nextInt(allIds.size))
        if (other != t) {
          val p = (math.min(t, other), math.max(t, other))
          if (!cur.contains(p)) cur += p
        }
      }
    }
    cur.toSet
  }

  def table9(): Table = {
    val xs = Seq(0.0, 0.1, 0.2, 0.3, 0.4, 0.5)
    val dsNames = Seq("M", "C")
    // Predictions are computed once; only the evaluation GT is corrupted.
    val preds: Map[String, Map[String, Set[(Long, Long)]]] = dsNames.map { n =>
      val p = prepared(n)
      n -> Map(
        "SIMPLE-EM" -> p.predictedSet(simpleEmOut(n).gamma),
        "SN" -> p.predictedSet(SnorkelModel.fitPredict(p.votes, 0)),
        "MV" -> p.predictedSet(MajorityVote.fitPredict(p.votes, 0)))
    }.toMap
    val methods = Seq("SIMPLE-EM", "SN", "MV")
    val rows = methods.map { m =>
      m +: xs.map { x =>
        val scores = dsNames.map { n =>
          val p = prepared(n)
          val ids = (p.pairs.map(_._1) ++ p.pairs.map(_._2)).distinct.toIndexedSeq
          val gt = corruptGt(p.ds.gt, ids, x, seed = 17)
          Metrics.f1(preds(n)(m), gt)
        }
        ff(avg(scores))
      }
    }
    Table("Table 9: F1 under injected transitivity violations (avg of M, C)",
      "method" +: xs.map(x => s"x=$x"), rows)
  }

  // --- Table 10: data shift --------------------------------------------------

  def table10(maxLabels: Int = 1200): Table = {
    val shifts = Seq(("DA", "DS"), ("AB", "AG"), ("AB", "WA"))
    val rows = shifts.map { case (src, tgt) =>
      val ps = prepared(src)
      val pt = prepared(tgt)
      // LFs: effort saved on the target by reusing source LFs.
      val (total, newLf) = LfSuite.paperCounts(tgt)
      val lfSaved = (total - newLf).toDouble / total
      // Manual labeling: AL on target alone vs AL warm-started with all
      // labeled source pairs; compare labels needed to reach LF performance.
      val target = pt.f1(simpleEmOut(tgt).gamma)
      def eval(g: Array[Double]): Double = pt.f1(g)
      val cap = math.min(maxLabels, pt.pairs.length)
      val alone = ActiveLearning.run(pt.feats, pt.truth, eval, batch = 25, maxLabels = cap, seed = 0)
      val warm  = ActiveLearning.run(pt.feats, pt.truth, eval, batch = 25, maxLabels = cap, seed = 0,
        warmStart = Some((ps.feats, ps.truth)))
      def needed(r: ActiveLearning.RunResult): Int = {
        val peak = r.steps.map(_.f1).max
        val goal = math.min(target, peak)
        r.steps.find(_.f1 >= goal).map(_.labelsUsed).getOrElse(cap)
      }
      val n1 = needed(alone); val n2 = needed(warm)
      val manualSaved = if (n1 == 0) 0.0 else (n1 - n2).toDouble / n1
      Seq(s"$src-$tgt", pct(manualSaved), pct(lfSaved))
    }
    Table("Table 10: saved labeling effort under data shift",
      Seq("data shift", "manual labeling", "LFs"), rows)
  }

  // --- Table 11: sensitivity to LFs ------------------------------------------

  def table11(): Table = {
    val scenarios = Seq(("Original", None, 1.0), ("RT+100%", Some(1L), 1.0),
      ("RT+80%", Some(2L), 0.8), ("RT+60%", Some(3L), 0.6), ("RT+40%", Some(4L), 0.4))
    val methods: Seq[(String, Runner.Prepared => Double)] = Seq(
      "SIMPLE-EM" -> { p =>
        p.f1(Runner.simpleEm(p, seed = 0).gamma)
      },
      "MV"   -> { p => p.f1(MajorityVote.fitPredict(p.votes, 0)) },
      "D&S"  -> { p => p.f1(DawidSkene.fitPredict(p.votes, 0)) },
      "EBCC" -> { p => p.f1(Ebcc.fitPredict(p.votes, 0)) },
      "SN"   -> { p => p.f1(SnorkelModel.fitPredict(p.votes, 0)) },
      "FS"   -> { p => p.f1(FlyingSquid.fitPredict(p.votes, 0)) })

    // Prepare per-scenario datasets (reusing the cached originals).
    val scenarioPrepared: Seq[(String, Seq[Runner.Prepared])] = scenarios.map {
      case (label, jitterSeed, frac) =>
        val ps = names.map { n =>
          jitterSeed match {
            case None => prepared(n)
            case Some(s) =>
              val lfs0 = LfSuite.randomized(n, seed = s * 1000 + n.hashCode)
              val lfs  = if (frac >= 1.0) lfs0 else LfSuite.sample(lfs0, frac, seed = s * 2000 + n.hashCode)
              Runner.prepare(spark, Datasets.byName(n), scale, Some(lfs))
          }
        }
        label -> ps
    }
    val rows = methods.map { case (mName, run) =>
      mName +: scenarioPrepared.map { case (_, ps) => ff(avg(ps.map(run))) }
    }
    Table("Table 11: sensitivity to LFs (avg F1 over all datasets)",
      "method" +: scenarios.map(_._1), rows)
  }

  // --- Table 12: WRENCH general weak supervision ------------------------------

  def table12(): Table = {
    val header = Seq("dataset", "# of LFs", "metric", "SIMPLE", "MV", "D&S", "EBCC", "FS", "SN")
    val models: Seq[LabelModel] = Seq(Simple, MajorityVote, DawidSkene, Ebcc, FlyingSquid, SnorkelModel)
    val all = WrenchGen.specs.map { spec =>
      val d = WrenchGen.generate(spec)
      val scores = models.map { m =>
        val pred = LabelModel.harden(m.fitPredict(d.votes, seed = 0))
        val (f1v, acc) = Metrics.binary(pred, d.truth)
        if (spec.metric == "F1") f1v else acc
      }
      (spec, scores)
    }
    val rows = all.map { case (spec, s) =>
      Seq(spec.name, spec.nLf.toString, spec.metric) ++ s.map(ff)
    } :+ (Seq("Avg.", "-", "-") ++ (0 until models.size).map(i => ff(avg(all.map(_._2(i))))))
    Table("Table 12: truth inference on general weak supervision tasks", header, rows)
  }

  def table12Scores(): Map[String, Map[String, Double]] = {
    val methodNames = Seq("SIMPLE", "MV", "D&S", "EBCC", "FS", "SN")
    val models: Seq[LabelModel] = Seq(Simple, MajorityVote, DawidSkene, Ebcc, FlyingSquid, SnorkelModel)
    WrenchGen.specs.map { spec =>
      val d = WrenchGen.generate(spec)
      val scores = models.map { m =>
        val pred = LabelModel.harden(m.fitPredict(d.votes, seed = 0))
        val (f1v, acc) = Metrics.binary(pred, d.truth)
        if (spec.metric == "F1") f1v else acc
      }
      spec.name -> methodNames.zip(scores).toMap
    }.toMap
  }

  // --- Table 13: duplicate-free detection -------------------------------------

  def table13(): Table = {
    val rows = Datasets.twoTable.map(_.name).map { n =>
      val p = prepared(n)
      // GT duplicate counts, estimated from cross-table matching pairs as in
      // the paper (two left tuples matching the same right tuple are dups).
      def dups(pairsSet: Set[(Long, Long)]): (Int, Int) = {
        val lDups = pairsSet.groupBy(_._2).values.map(g => g.size * (g.size - 1) / 2).sum
        val rDups = pairsSet.groupBy(_._1).values.map(g => g.size * (g.size - 1) / 2).sum
        (lDups, rDups)
      }
      val partial = p.ds.partial.isDefined
      val (gl, gr) = dups(p.ds.gt)
      val predMatches = p.pairs.indices.filter(simpleGamma(n)(_) >= 0.5).map(p.pairs)
      val (pl, pr) = dups(predMatches.toSet)
      val ldf = DupFreeDetect.leftDupFree(predMatches, p.ds.nRight)
      val rdf = DupFreeDetect.rightDupFree(predMatches, p.ds.nLeft)
      val helpful = {
        val em = p.f1(simpleEmOut(n).gamma); val no = p.f1(simpleGamma(n))
        if (em > no + 1e-9) "Yes" else if (em < no - 1e-9) "No" else "Same"
      }
      Seq(n,
        if (partial) "-" else s"$gl, $gr",
        if (partial) "-" else s"$pl, $pr",
        s"${if (ldf.dupFree) "T" else "F"}, ${if (rdf.dupFree) "T" else "F"}",
        helpful)
    }
    Table("Table 13: duplicate-free detection on two-table datasets",
      Seq("dataset", "GT dups (L,R)", "pred dups from M (L,R)", "dup-free pred (L,R)", "dup-free solution helpful?"),
      rows)
  }
}
