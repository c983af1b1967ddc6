package repro.exp

import org.scalatest.funsuite.AnyFunSuite

class TableFmtSpec extends AnyFunSuite {

  private val t = TableFmt.Table("Demo", Seq("a", "bb"), Seq(Seq("1", "2"), Seq("333", "4")))

  test("render contains title, header and all cells") {
    val r = t.render
    assert(r.contains("== Demo =="))
    assert(r.contains("a") && r.contains("bb"))
    assert(r.contains("333") && r.contains("4"))
  }

  test("columns are padded to the widest cell") {
    val lines = t.render.linesIterator.toVector
    // header line and row lines all have identical length
    val dataLines = lines.drop(1)
    assert(dataLines.map(_.length).distinct.size == 1)
  }

  test("separator row uses dashes") {
    assert(t.render.linesIterator.toVector(2).forall(c => c == '-' || c == '|'))
  }

  test("f formats to three decimals") {
    assert(TableFmt.f(0.12345) == "0.123")
    assert(TableFmt.f(1.0) == "1.000")
  }

  test("pct formats to one decimal percent") {
    assert(TableFmt.pct(0.625) == "62.5%")
    assert(TableFmt.pct(-0.232) == "-23.2%")
  }

  test("ragged rows do not crash rendering") {
    val ragged = TableFmt.Table("R", Seq("x", "y"), Seq(Seq("only")))
    assert(ragged.render.contains("only"))
  }
}
