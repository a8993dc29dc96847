package repro.eval

import org.scalatest.funsuite.AnyFunSuite

class TableFmtSpec extends AnyFunSuite {

  test("render pads columns and includes title, header, separator, rows") {
    val out = TableFmt.render("My Table", Seq("a", "long-header"),
      Seq(Seq("1", "2"), Seq("333", "4")))
    val lines = out.split("\n")
    assert(lines(0) == "== My Table ==")
    assert(lines(1).startsWith("a  "))
    assert(lines(2).matches("[- ]+"))
    assert(lines.length == 5)
    // All data lines padded to the same width.
    assert(lines.drop(1).map(_.length).distinct.size == 1)
  }

  test("render handles empty row list") {
    val out = TableFmt.render("t", Seq("h1", "h2"), Nil)
    assert(out.contains("h1") && out.split("\n").length == 3)
  }

  test("fmt: zero") { assert(TableFmt.fmt(0.0) == "0") }

  test("fmt: large values have no decimals") {
    assert(TableFmt.fmt(12345.67) == "12346")
  }

  test("fmt: mid-range values keep 3 decimals") {
    assert(TableFmt.fmt(3.14159) == "3.142")
  }

  test("fmt: small values keep 5 decimals") {
    assert(TableFmt.fmt(0.0123456) == "0.01235")
  }

  test("fmt: negative values formatted by magnitude") {
    assert(TableFmt.fmt(-3.14159) == "-3.142")
    assert(TableFmt.fmt(-2000.4) == "-2000")
  }

  test("runtime renderers handle missing method entries as NaN") {
    val rows = Seq(RuntimeMeasure.RuntimeRow("VOS", 10, 5.0, 100))
    val out = BenchTables.renderRuntimeVsK(rows, "partial")
    assert(out.contains("NaN"))
  }

  test("accuracy renderer keeps dataset order of first appearance") {
    val rows = Seq(
      AccuracyRow("ds-b", "VOS", 1, 10, 0.1, 0.2, 5),
      AccuracyRow("ds-a", "VOS", 1, 10, 0.3, 0.4, 5),
    )
    val out = BenchTables.renderAccuracyAllDatasets(rows, "AAPE", "t")
    val bIdx = out.indexOf("ds-b"); val aIdx = out.indexOf("ds-a")
    assert(bIdx >= 0 && aIdx > bIdx)
  }

  test("accuracy-over-time renderer sorts checkpoints ascending") {
    val rows = Seq(
      AccuracyRow("d", "VOS", 2, 20, 0.2, 0.2, 5),
      AccuracyRow("d", "VOS", 1, 10, 0.1, 0.1, 5),
    )
    val out = BenchTables.renderAccuracyOverTime(rows, "AAPE", "t").split("\n")
    assert(out(3).trim.startsWith("1") && out(4).trim.startsWith("2"))
  }
}
