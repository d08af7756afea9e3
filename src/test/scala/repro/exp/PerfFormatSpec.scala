package repro.exp

import org.scalatest.funsuite.AnyFunSuite

/** Pure checks of experiment plumbing that need no SparkSession. */
class PerfFormatSpec extends AnyFunSuite {

  test("PerfExp.format renders a header and one line per row") {
    val rows = Seq(
      PerfExp.PerfRow(5000, 1.0, 0.1, 2.0, 0.05),
      PerfExp.PerfRow(20000, 4.0, 0.1, 8.0, 0.05),
    )
    val text = PerfExp.format(rows)
    assert(text.linesIterator.size == 3)
    assert(text.contains("5000") && text.contains("20000"))
  }

  test("TableIIExp.format includes every summary field") {
    val rows = Seq(TableIIExp.SummaryRow("NYC", "TUPSK", 185.3, 0.86, 0.93, 42))
    val text = TableIIExp.format(rows)
    assert(text.contains("NYC") && text.contains("TUPSK"))
    assert(text.contains("185.3") && text.contains("0.86") && text.contains("0.93"))
  }

  test("TableIExp.summarize orders rows by (dataset, sketch)") {
    val recs = Seq(
      TableIExp.Rec("B", 0, 16, "KeyInd", "TUPSK", "MLE", 1.0, 1.0, 10),
      TableIExp.Rec("A", 0, 16, "KeyInd", "LV2SK", "MLE", 1.0, 1.0, 10),
      TableIExp.Rec("A", 0, 16, "KeyInd", "CSK", "MLE", 1.0, 1.0, 10),
    )
    val rows = TableIExp.summarize(recs, 100)
    assert(rows.map(r => (r.dataset, r.sketch)) ==
      Seq(("A", "CSK"), ("A", "LV2SK"), ("B", "TUPSK")))
  }

  test("TableIIExp.summarize yields NaN Spearman when too few pairs survive") {
    val recs = Seq(TableIIExp.Rec("NYC", 0, "TUPSK", "MLE", 10, 1.0, 200, 1.1))
    val row  = TableIIExp.summarize(recs).head
    assert(row.nPairs == 1 && row.spearman.isNaN)
  }

  test("SketchConf rejects non-positive sizes") {
    intercept[IllegalArgumentException](repro.sketch.Sketch.SketchConf(0))
    intercept[IllegalArgumentException](repro.sketch.Sketch.SketchConf(-5))
  }

  test("AggFn names match the paper's featurization functions") {
    import repro.sketch.AggFn._
    assert(Seq(First, Avg, Count, Mode, Max, Min).map(_.name) ==
      Seq("FIRST", "AVG", "COUNT", "MODE", "MAX", "MIN"))
  }

  test("Sketcher.all covers the five evaluated schemes") {
    assert(repro.sketch.Sketcher.all.map(_.name).sorted ==
      Seq("CSK", "INDSK", "LV2SK", "PRISK", "TUPSK"))
  }
}
