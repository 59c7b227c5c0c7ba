package repro.experiments

import org.scalatest.funsuite.AnyFunSuite

class FmtSpec extends AnyFunSuite {

  test("ExpTable renders a well-formed markdown table") {
    val t = ExpTable("Demo", Seq("A", "Bee"), Seq(Seq("1", "2"), Seq("333", "4")))
    val lines = t.render.linesIterator.toSeq
    assert(lines.head === "### Demo")
    assert(lines(1).startsWith("| A"))
    assert(lines(2).startsWith("|-"))
    assert(lines.length === 5)
    // all table rows have identical width
    assert(lines.drop(1).map(_.length).distinct.size === 1)
  }

  test("ExpTable pads cells to the column width") {
    val t = ExpTable("T", Seq("col"), Seq(Seq("x"), Seq("longer")))
    val lines = t.render.linesIterator.toSeq
    assert(lines(3) === "| x      |")
    assert(lines(4) === "| longer |")
  }

  test("number formatting helpers") {
    assert(Fmt.f2(1.005) === "1.00" || Fmt.f2(1.005) === "1.01") // locale-stable two decimals
    assert(Fmt.f4(0.98765) === "0.9877" || Fmt.f4(0.98765) === "0.9876")
    assert(Fmt.minutes(120000.0) === "2.00")
  }

  test("timed measures elapsed wall time and returns the value") {
    val (v, ms) = Fmt.timed { Thread.sleep(30); 42 }
    assert(v === 42)
    assert(ms >= 25)
  }
}
