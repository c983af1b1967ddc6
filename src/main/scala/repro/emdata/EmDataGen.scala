package repro.emdata

import org.apache.spark.sql.{DataFrame, SparkSession}
import scala.util.Random

/** Synthetic EM benchmark generator (DESIGN.md substitution #1).
  *
  * World model: a set of real-world entities, each with a name (brand +
  * category words + a rare model token), a brand, a price, a size and a
  * year. Records are noisy renditions of an entity: word drops, model-token
  * typos, price jitter, missing attributes, word-order shuffling, spurious
  * words. Two-table datasets draw each entity into the left/right table with
  * configurable coverage and per-side duplicate rates; single-table datasets
  * draw entity clusters. Ground truth is all record pairs sharing an entity.
  *
  * Everything is deterministic in (config.seed, scale).
  */
object EmDataGen {

  /** One record row; `entity` is hidden ground truth, never shown to LFs. */
  final case class Rec(rid: Long, entity: Long, name: String, brand: String,
                       price: Option[Double], size: Option[Int], year: Option[Int])

  final case class EmConfig(
      name: String,
      twoTable: Boolean,
      nEntities: Int,
      pLeft: Double = 0.9, pRight: Double = 0.8,
      leftDup: Double = 0.0, rightDup: Double = 0.0, // geometric extra-record rates
      clusterExtra: Double = 1.0,                    // single-table cluster size - 1 (mean)
      tokenDrop: Double = 0.1, typo: Double = 0.05, missing: Double = 0.15,
      priceJitter: Double = 0.05, extraWord: Double = 0.1,
      modelCollide: Double = 0.1,                    // entities sharing a model token
      attrNoise: Double = 0.1,                       // size/year perturbed per record
      partialGtFrac: Double = 0.0,                   // >0: only a sample of GT is labeled
      seed: Long = 42)

  /** A generated dataset: record DataFrames plus driver-side ground truth.
    * For single-table datasets `left eq right` and GT pairs are normalized
    * (min, max). `partial` carries (labeledMatches, labeledNonMatches) for
    * partial-GT datasets (IR/YY/ABN analogues).
    */
  final case class EmDataset(cfg: EmConfig,
                             left: DataFrame, right: DataFrame,
                             nLeft: Long, nRight: Long,
                             gt: Set[(Long, Long)],
                             partial: Option[(Set[(Long, Long)], Set[(Long, Long)])]) {
    /** Ground-truth pairs the evaluation may score (all GT, or the labeled
      * subset for partial-GT datasets).
      */
    def evalTruth: Set[(Long, Long)] = partial.map(_._1).getOrElse(gt)
    /** For partial-GT datasets, only these pairs are scored at all. */
    def evalScope: Option[Set[(Long, Long)]] = partial.map(p => p._1 ++ p._2)
  }

  // A ~500-word vocabulary: wide enough that category-word collisions don't
  // blow up the overlap blocker's candidate set quadratically, narrow enough
  // that non-matching records still collide (blocking noise, LF conflicts).
  private val CategoryWords: Vector[String] = {
    val syll = Vector("ba", "ce", "di", "fo", "gu", "ha", "ki", "lo", "mu", "ne",
                      "pa", "qi", "ro", "su", "ta", "vu", "wa", "xe", "yo", "zu")
    val rng = new Random(7)
    Vector.fill(500)(Vector.fill(3)(syll(rng.nextInt(syll.length))).mkString).distinct
  }
  private val Brands = Vector(
    "acmetech", "zenix", "orbita", "lumora", "vextron", "quanta", "halcyon",
    "nordwind", "solaris", "kitevale", "pinnacle", "bravura", "calypso",
    "drift", "emberline", "fluxon", "gryphon", "hyperia", "ionix", "jadecraft")

  private final case class Entity(id: Long, brand: String, words: Vector[String],
                                  model: String, price: Double, size: Int, year: Int)

  private def mkEntity(id: Long, cfg: EmConfig): Entity = {
    val rng = new Random(cfg.seed * 1000003L + id)
    // With probability modelCollide the entity is a VARIANT in a product
    // family: it shares the family's model token, brand and most name words
    // with its sibling entities, differing only in (noisy) attributes. These
    // are the hard non-matches on which text LFs systematically misfire —
    // the conflicts a labeling model must resolve.
    if (rng.nextDouble() < cfg.modelCollide) {
      val pool = math.max(3, cfg.nEntities / 6)
      val fam  = rng.nextInt(pool)
      val famRng = new Random(cfg.seed ^ (fam * 2654435761L))
      val brand = Brands(famRng.nextInt(Brands.length))
      val famWords = Vector.fill(2)(CategoryWords(famRng.nextInt(CategoryWords.length)))
      val ownWord  = CategoryWords(rng.nextInt(CategoryWords.length))
      val model = f"mx9${fam}%04dk77"
      val price = math.round((20 + famRng.nextDouble() * 980) * (0.8 + rng.nextDouble() * 0.4) * 100) / 100.0
      Entity(id, brand, (famWords :+ ownWord).distinct, model, price,
        10 + rng.nextInt(50), 1995 + rng.nextInt(28))
    } else {
      val brand = Brands(rng.nextInt(Brands.length))
      val words = Vector.fill(3)(CategoryWords(rng.nextInt(CategoryWords.length))).distinct
      val model = f"mx${id}%04dk${rng.nextInt(90) + 10}"
      val price = math.round((20 + rng.nextDouble() * 980) * 100) / 100.0
      Entity(id, brand, words, model, price, 10 + rng.nextInt(50), 1995 + rng.nextInt(28))
    }
  }

  private def typoize(tok: String, rng: Random): String = {
    val i = rng.nextInt(tok.length)
    val c = ('a' + rng.nextInt(26)).toChar
    tok.updated(i, c)
  }

  private def mkRecord(rid: Long, e: Entity, cfg: EmConfig, rng: Random): Rec = {
    val model = if (rng.nextDouble() < cfg.typo) typoize(e.model, rng) else e.model
    var toks  = Vector(e.brand) ++ e.words.filter(_ => rng.nextDouble() >= cfg.tokenDrop) :+ model
    if (rng.nextDouble() < cfg.extraWord)
      toks :+= CategoryWords(rng.nextInt(CategoryWords.length))
    toks = rng.shuffle(toks)
    val price =
      if (rng.nextDouble() < cfg.missing) None
      else Some(math.round(e.price * (1 + (rng.nextDouble() * 2 - 1) * cfg.priceJitter) * 100) / 100.0)
    // Attribute noise: sizes/years recorded slightly differently per source,
    // so the size/year-unmatch LFs occasionally misfire on true matches.
    val size =
      if (rng.nextDouble() < cfg.missing) None
      else Some(e.size + (if (rng.nextDouble() < cfg.attrNoise) 1 + rng.nextInt(2) else 0))
    val year =
      if (rng.nextDouble() < cfg.missing) None
      else Some(e.year + (if (rng.nextDouble() < cfg.attrNoise) 1 else 0))
    Rec(rid, e.id, toks.mkString(" "), e.brand, price, size, year)
  }

  /** Geometric count with mean ≈ rate, capped. */
  private def geom(rate: Double, cap: Int, rng: Random): Int = {
    if (rate <= 0) return 0
    val q = rate / (1 + rate)
    var k = 0
    while (k < cap && rng.nextDouble() < q) k += 1
    k
  }

  def generate(spark: SparkSession, cfg0: EmConfig, scale: Double = 1.0): EmDataset = {
    import spark.implicits._
    val cfg = cfg0.copy(nEntities = math.max(10, (cfg0.nEntities * scale).toInt))
    val rng = new Random(cfg.seed)
    val entities = (1L to cfg.nEntities.toLong).map(mkEntity(_, cfg))

    if (cfg.twoTable) {
      var nextL = 1L
      var nextR = 1000000L
      val leftRecs  = Vector.newBuilder[Rec]
      val rightRecs = Vector.newBuilder[Rec]
      entities.foreach { e =>
        val inL = rng.nextDouble() < cfg.pLeft
        val inR = rng.nextDouble() < cfg.pRight
        if (inL) {
          val copies = 1 + geom(cfg.leftDup, 4, rng)
          for (c <- 0 until copies) {
            leftRecs += mkRecord(nextL, e, cfg, new Random(cfg.seed ^ (e.id * 7919 + c)))
            nextL += 1
          }
        }
        if (inR) {
          val copies = 1 + geom(cfg.rightDup, 4, rng)
          for (c <- 0 until copies) {
            rightRecs += mkRecord(nextR, e, cfg, new Random(cfg.seed ^ (e.id * 104729 + 31 * c + 13)))
            nextR += 1
          }
        }
      }
      val lv = leftRecs.result(); val rv = rightRecs.result()
      val gt = (for {
        l <- lv; r <- rv if l.entity == r.entity
      } yield (l.rid, r.rid)).toSet
      val partial = mkPartial(cfg, gt, lv.map(_.rid), rv.map(_.rid), rng)
      EmDataset(cfg, lv.toDF(), rv.toDF(), lv.size.toLong, rv.size.toLong, gt, partial)
    } else {
      var next = 1L
      val recs = Vector.newBuilder[Rec]
      entities.foreach { e =>
        if (rng.nextDouble() < cfg.pLeft) {
          val copies = 1 + geom(cfg.clusterExtra, 7, rng)
          for (c <- 0 until copies) {
            recs += mkRecord(next, e, cfg, new Random(cfg.seed ^ (e.id * 7919 + c)))
            next += 1
          }
        }
      }
      val v = recs.result()
      val byEntity = v.groupBy(_.entity)
      val gt = byEntity.values.flatMap { cluster =>
        for (i <- cluster.indices; j <- (i + 1) until cluster.size)
          yield (math.min(cluster(i).rid, cluster(j).rid), math.max(cluster(i).rid, cluster(j).rid))
      }.toSet
      val df = v.toDF()
      val partial = mkPartial(cfg, gt, v.map(_.rid), v.map(_.rid), rng)
      EmDataset(cfg, df, df, v.size.toLong, v.size.toLong, gt, partial)
    }
  }

  /** Sample a labeled subset (matches + ~1.5x non-matches) for partial-GT
    * datasets, mirroring IR/YY/ABN where most of the candidate space is
    * unlabeled.
    */
  private def mkPartial(cfg: EmConfig, gt: Set[(Long, Long)],
                        lIds: Seq[Long], rIds: Seq[Long],
                        rng: Random): Option[(Set[(Long, Long)], Set[(Long, Long)])] = {
    if (cfg.partialGtFrac <= 0) None
    else {
      val matches = rng.shuffle(gt.toVector)
        .take(math.max(5, (gt.size * cfg.partialGtFrac).toInt)).toSet
      val wanted = math.max(8, (matches.size * 1.5).toInt)
      val nonMatches = Iterator.continually {
        val a = lIds(rng.nextInt(lIds.size)); val b = rIds(rng.nextInt(rIds.size))
        if (cfg.twoTable) (a, b) else (math.min(a, b), math.max(a, b))
      }.filter(p => p._1 != p._2 && !gt.contains(p)).take(wanted).toSet
      Some((matches, nonMatches))
    }
  }
}
