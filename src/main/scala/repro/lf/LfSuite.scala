package repro.lf

import scala.util.Random
import LabelingFunctions._

/** Per-dataset LF suites mirroring the paper's Table 2: the LF *count* and
  * the *new-LF* count per dataset match the paper exactly; most LFs are
  * cheap threshold/attribute variants of earlier ones (hence correlated —
  * the property that breaks the independence assumptions of Snorkel /
  * FlyingSquid on some datasets).
  *
  * `jitter` rescales every real-valued threshold — the Table 11 "randomized
  * thresholds" study; `sampleFrac` keeps a random subset of the suite.
  */
object LfSuite {

  /** Paper Table 2: (total LFs, new LFs) per dataset. */
  val paperCounts: Map[String, (Int, Int)] = Map(
    "FZ" -> (12, 5), "DA" -> (13, 6), "DS" -> (16, 4), "AB" -> (13, 4),
    "AG" -> (13, 3), "WA" -> (14, 2), "IR" -> (8, 1), "YY" -> (10, 1),
    "ABN" -> (13, 2), "M" -> (10, 3), "C" -> (11, 2))

  /** Paper Table 2: minutes of human effort (not reproducible offline —
    * recorded for the Table 2 bench output).
    */
  val paperMinutes: Map[String, Int] = Map(
    "FZ" -> 30, "DA" -> 50, "DS" -> 45, "AB" -> 30, "AG" -> 20, "WA" -> 15,
    "IR" -> 10, "YY" -> 10, "ABN" -> 15, "M" -> 25, "C" -> 15)

  /** Builds the suite for a dataset. `jitter` maps each threshold t to a
    * perturbed value (identity by default).
    */
  def suite(dataset: String, jitter: Double => Double = identity): Seq[Lf] = {
    def j(t: Double): Double = math.max(0.01, math.min(0.99, jitter(t)))
    def ji(t: Int): Int = math.max(1, math.round(jitter(t.toDouble)).toInt)
    // Dirtier datasets get lower match thresholds, like a user would tune.
    val dirt: Double = dataset match {
      case "FZ" | "DA" | "IR" | "YY" => 0.0
      case "DS" | "M" | "ABN"        => 0.1
      case "AB" | "C"                => 0.2
      case "AG"                      => 0.25
      case "WA"                      => 0.3
      case _                         => 0.1
    }
    val hi  = 0.55 - dirt * 0.6 // base +1 jaccard threshold
    val lo  = 0.12 - dirt * 0.15

    // A realistic mix, as the paper's users produce: a few well-tuned LFs, a
    // set of cheap threshold variants (correlated), and several mis-tuned or
    // misleading ones (loose positives that fire on hard non-matches, strict
    // negatives that misfire on noisy true matches). Plain majority vote
    // over-counts the correlated loose/misleading LFs; a labeling model that
    // learns LF interactions can discount them.
    val pool: Vector[Lf] = Vector(
      nameJaccard("name_jaccard", j(hi), j(math.max(0.02, lo)), isNew = true),
      modelMatch("model_match", isNew = true), // misfires on shared model families
      priceBand("price_band", j(0.06), j(0.5), isNew = true),
      sizeUnmatch("size_unmatch", isNew = true),   // misfires under attribute noise
      brandAndName("brand_and_name", j(math.max(0.05, hi - 0.15)), isNew = true),
      yearUnmatch("year_unmatch", isNew = true),   // misfires under attribute noise
      nameJaccard("name_jaccard_loose", j(math.max(0.04, hi - 0.25)), j(math.max(0.01, lo - 0.06))),
      nameContainment("containment_loose", j(math.max(0.1, hi - 0.05)), j(math.max(0.02, lo))),
      brandAndName("brand_and_name_loose", j(math.max(0.04, hi - 0.3))),
      priceBand("price_band_loose", j(0.25), j(0.9)),
      nameOverlap("name_overlap", ji(3), ji(1)),
      nameJaccard("name_jaccard_strict", j(math.min(0.95, hi + 0.15)), j(math.max(0.02, lo + 0.05))),
      brandUnmatch("brand_unmatch"),
      nameContainment("name_containment", j(math.min(0.95, hi + 0.25)), j(lo + 0.08)),
      nameOverlap("name_overlap_2", ji(4), ji(1)),
      nameJaccard("name_jaccard_4", j(math.min(0.95, hi + 0.2)), j(math.max(0.01, lo - 0.02))))

    val (total, newCnt) = paperCounts.getOrElse(dataset, (12, 4))
    val chosen = pool.take(total)
    // Re-flag so exactly `newCnt` LFs count as "new" for this dataset.
    chosen.zipWithIndex.map { case (lf, i) => lf.copy(isNew = i < newCnt) }
  }

  /** Randomized-threshold variant (Table 11 "RT"): each threshold scaled by
    * U(1-range, 1+range).
    */
  def randomized(dataset: String, seed: Long, range: Double = 0.2): Seq[Lf] = {
    val rng = new Random(seed)
    suite(dataset, t => t * (1 - range + 2 * range * rng.nextDouble()))
  }

  /** Keep a random `frac` of the suite (at least 2 LFs). */
  def sample(lfs: Seq[Lf], frac: Double, seed: Long): Seq[Lf] = {
    val rng = new Random(seed)
    val k = math.max(2, math.round(lfs.size * frac).toInt)
    rng.shuffle(lfs.toVector).take(k)
  }
}
