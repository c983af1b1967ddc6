package repro.bench

import repro.emdata.Datasets
import repro.lf.LfSuite

/** Table 1 — dataset statistics of the 11 synthetic analogues. */
class Table01DatasetsBench extends BenchSpec {
  test("Table 1: all 11 datasets generate with sane statistics") {
    val t = exp.table1()
    show(t)
    assert(t.rows.size == 11)
    // Blocking recall stays high (paper: 0.88–1.0).
    t.rows.foreach { r =>
      val recall = r.last.toDouble
      assert(recall > 0.7, s"${r.head} recall $recall")
    }
    // Two-table analogues keep the paper's left/right size relations: DS and
    // WA have a much larger right table.
    val sizes = t.rows.map(r => r.head -> r(1)).toMap
    val Array(dsL, dsR) = sizes("DS").split(",").map(_.trim.toLong)
    assert(dsR > dsL * 1.5)
  }
}

/** Table 2 — LF development effort per dataset. */
class Table02LfStatsBench extends BenchSpec {
  test("Table 2: LF counts match the paper exactly") {
    val t = exp.table2()
    show(t)
    t.rows.foreach { r =>
      val (total, newCnt) = LfSuite.paperCounts(r.head)
      assert(r(1).toInt == total && r(2).toInt == newCnt, r.head)
    }
    assert(t.rows.map(_.head) == Datasets.all.map(_.name))
  }
}
