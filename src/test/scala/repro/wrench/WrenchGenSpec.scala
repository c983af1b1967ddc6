package repro.wrench

import org.scalatest.funsuite.AnyFunSuite
import repro.core.{MajorityVote, Metrics, Simple}

class WrenchGenSpec extends AnyFunSuite {

  test("there are ten specs matching the paper's LF counts") {
    assert(WrenchGen.specs.size == 10)
    val counts = WrenchGen.specs.map(s => s.name -> s.nLf).toMap
    assert(counts("basketball") == 4 && counts("sms") == 73 && counts("census") == 83)
  }

  test("metrics follow the paper (acc for yelp/imdb/youtube, F1 otherwise)") {
    val m = WrenchGen.specs.map(s => s.name -> s.metric).toMap
    assert(m("yelp") == "acc" && m("imdb") == "acc" && m("youtube") == "acc")
    assert(m("cdr") == "F1" && m("spouse") == "F1")
  }

  test("generation is deterministic") {
    val a = WrenchGen.generate(WrenchGen.specs.head)
    val b = WrenchGen.generate(WrenchGen.specs.head)
    assert(a.truth.sameElements(b.truth))
    assert(a.votes.zip(b.votes).forall { case (x, y) => x.sameElements(y) })
  }

  test("votes have the declared shape and support") {
    val d = WrenchGen.generate(WrenchGen.specs(3)) // yelp
    assert(d.votes.length == d.spec.n)
    assert(d.votes.forall(_.length == d.spec.nLf))
    assert(d.votes.flatten.toSet.subsetOf(Set(-1, 0, 1)))
  }

  test("class rate approximates the spec posRate") {
    val d = WrenchGen.generate(WrenchGen.specs(5)) // spouse, 8%
    val rate = d.truth.sum.toDouble / d.truth.length
    assert(math.abs(rate - d.spec.posRate) < 0.05)
  }

  test("the precise LFs beat random guessing (weak supervision premise)") {
    val spec = WrenchGen.specs(2) // tennis
    val d = WrenchGen.generate(spec)
    // The highest-quality parent (last parent index) should agree with truth
    // well above chance on covered rows. (Parent 0 is deliberately the
    // noisiest — the spammy block leader.)
    val best = spec.parents - 1
    val covered = d.votes.indices.filter(i => d.votes(i)(best) != 0)
    val agree = covered.count { i =>
      val y = if (d.truth(i) == 1) 1 else -1; d.votes(i)(best) == y
    }
    assert(agree.toDouble / covered.size > 0.55)
  }

  test("children are correlated with their parent LF") {
    val spec = WrenchGen.specs(8) // sms: 73 LFs, 15 parents
    val d = WrenchGen.generate(spec)
    val p = 0; val child = spec.parents // child of parent 0
    val both = d.votes.filter(v => v(p) != 0 && v(child) != 0)
    if (both.length > 20) {
      val agree = both.count(v => v(p) == v(child)).toDouble / both.length
      assert(agree > 0.6, s"agreement $agree")
    }
  }

  test("majority vote achieves sane quality on every spec") {
    WrenchGen.specs.foreach { spec =>
      val d = WrenchGen.generate(spec)
      val pred = MajorityVote.fitPredict(d.votes).map(g => if (g >= 0.5) 1 else 0)
      val (f1, acc) = Metrics.binary(pred, d.truth)
      val score = if (spec.metric == "F1") f1 else acc
      assert(score > 0.1, s"${spec.name}: $score")
    }
  }

  test("SIMPLE runs end-to-end on a small wrench dataset") {
    val d = WrenchGen.generate(WrenchGen.specs.head.copy(n = 400))
    val g = Simple.fitPredict(d.votes, 0)
    assert(g.length == 400)
  }
}
