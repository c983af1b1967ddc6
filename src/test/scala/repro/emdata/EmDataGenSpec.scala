package repro.emdata

import repro.SparkSpec
import EmDataGen._

class EmDataGenSpec extends SparkSpec {

  private lazy val fz = EmDataGen.generate(spark, Datasets.FZ, scale = 0.3)
  private lazy val ds = EmDataGen.generate(spark, Datasets.DS, scale = 0.3)
  private lazy val m  = EmDataGen.generate(spark, Datasets.M, scale = 0.3)
  private lazy val ir = EmDataGen.generate(spark, Datasets.IR, scale = 0.3)

  test("two-table generation produces disjoint id spaces") {
    val lIds = fz.left.select("rid").collect().map(_.getLong(0)).toSet
    val rIds = fz.right.select("rid").collect().map(_.getLong(0)).toSet
    assert(lIds.intersect(rIds).isEmpty)
    assert(fz.nLeft == lIds.size && fz.nRight == rIds.size)
  }

  test("ground truth pairs reference existing records") {
    val lIds = fz.left.select("rid").collect().map(_.getLong(0)).toSet
    val rIds = fz.right.select("rid").collect().map(_.getLong(0)).toSet
    fz.gt.foreach { case (l, r) => assert(lIds(l) && rIds(r)) }
  }

  test("dup-free configs yield one record per entity per side") {
    val lEnt = fz.left.select("entity").collect().map(_.getLong(0))
    assert(lEnt.distinct.length == lEnt.length) // FZ left is duplicate-free
  }

  test("DS config yields left-table duplicates") {
    val lEnt = ds.left.select("entity").collect().map(_.getLong(0))
    assert(lEnt.distinct.length < lEnt.length)
  }

  test("generation is deterministic in (seed, scale)") {
    val a = EmDataGen.generate(spark, Datasets.FZ, 0.3)
    assert(a.gt == fz.gt)
    assert(a.left.collect().toSeq == fz.left.collect().toSeq)
  }

  test("scale shrinks the dataset") {
    val small = EmDataGen.generate(spark, Datasets.FZ, 0.1)
    assert(small.nLeft < fz.nLeft)
  }

  test("single-table datasets share one DataFrame and normalized GT pairs") {
    assert(m.left eq m.right)
    m.gt.foreach { case (a, b) => assert(a < b) }
  }

  test("single-table clusters induce transitively-closed GT") {
    // group GT pairs by connected component: all intra-component pairs present
    val ids = m.gt.flatMap(p => Seq(p._1, p._2)).toVector.sorted
    val idx = ids.zipWithIndex.toMap
    val uf = new repro.ml.UnionFind(ids.size)
    m.gt.foreach { case (a, b) => uf.union(idx(a), idx(b)) }
    for (i <- ids.indices; j <- (i + 1) until ids.size if uf.find(i) == uf.find(j)) {
      assert(m.gt.contains((ids(i), ids(j))))
    }
  }

  test("partial-GT datasets expose a labeled subset only") {
    assert(ir.partial.isDefined)
    val (lm, ln) = ir.partial.get
    assert(lm.subsetOf(ir.gt))
    assert(ln.intersect(ir.gt).isEmpty)
    assert(ir.evalTruth == lm)
    assert(ir.evalScope.get == lm ++ ln)
  }

  test("full-GT datasets score everything") {
    assert(fz.partial.isEmpty && fz.evalTruth == fz.gt && fz.evalScope.isEmpty)
  }

  test("records carry nulls according to the missing rate") {
    val withNull = ds.left.where("price is null").count()
    assert(withNull > 0)
    val cleanCount = fz.left.where("price is null").count()
    assert(cleanCount.toDouble / fz.nLeft < 0.25)
  }

  test("names contain the rare model token most of the time") {
    val rows = fz.left.select("name").collect().map(_.getString(0))
    val withModel = rows.count(_.split(" ").exists(_.matches("mx\\d+k\\d+")))
    assert(withModel.toDouble / rows.length > 0.8)
  }

  test("all 11 dataset configs generate without error at tiny scale") {
    Datasets.all.foreach { cfg =>
      val d = EmDataGen.generate(spark, cfg, 0.05)
      assert(d.nLeft > 0 && d.gt != null)
    }
  }

  test("match rates are in a plausible EM range") {
    // candidate-free sanity: #matches vs table sizes
    assert(fz.gt.size > 10 && fz.gt.size <= fz.nLeft * 3)
    assert(m.gt.size > m.nLeft / 4) // single-table clusters produce many pairs
  }
}
