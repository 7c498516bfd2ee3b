package repro.bench

import org.scalatest.funsuite.AnyFunSuite

class HarnessSpec extends AnyFunSuite {

  test("table renders header, separator and aligned rows") {
    val t = Harness.table("T", Seq("a", "bb"), Seq(Seq("1", "2"), Seq("333", "4")))
    val lines = t.split("\n")
    assert(lines(0) == "== T ==")
    assert(lines(1).contains("| a  ") && lines(1).contains("| bb |"))
    assert(lines(2).startsWith("|-"))
    assert(lines.length == 5)
    // all body lines share the header's width
    assert(lines.drop(1).map(_.length).distinct.size == 1)
  }

  test("formatters render fixed decimals") {
    assert(Harness.f1(1.25) == "1.2" || Harness.f1(1.25) == "1.3")
    assert(Harness.f2(3.14159) == "3.14")
    assert(Harness.pct(12.345) == "12.3%")
  }

  test("default scale honours REPRO_SCALE or falls back to 1.0") {
    if (!sys.env.contains("REPRO_SCALE")) assert(Harness.defaultScale == 1.0)
  }

  test("Table1 paper reference covers all five KGs") {
    assert(Table1.paper.keySet ==
      Set("MAG-42M", "YAGO-30M", "DBLP-15M", "ogbl-wikikg2", "YAGO3-10"))
    assert(Table1.divisor("YAGO3-10") == 100.0)
    assert(Table1.divisor("MAG-42M") == 1000.0)
  }

  test("Table3 and Table4 paper references cover their tasks") {
    assert(Table3.paper.keys.map(_._1).toSet == Table3.tasks.map(_._1).toSet)
    assert(Table4.paper.keys.map(_._1).toSet == Table4.tasks.map(_._1).toSet)
  }
}
