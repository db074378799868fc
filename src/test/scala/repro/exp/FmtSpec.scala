package repro.exp

import org.scalatest.funsuite.AnyFunSuite

class FmtSpec extends AnyFunSuite {
  test("renders an aligned table with title, header and separator") {
    val out = Fmt.table("T", Seq("a", "bb"), Seq(Seq("xxx", "y"), Seq("z", "wwww")))
    val lines = out.split('\n')
    assert(lines(0) == "== T ==")
    assert(lines(1).contains("a") && lines(1).contains("bb"))
    assert(lines(2).forall(c => c == '-' || c == '|'))
    assert(lines.drop(1).map(_.length).distinct.size == 1, "all rows align")
  }
  test("handles a header-only table") {
    val out = Fmt.table("T", Seq("col"), Seq.empty)
    assert(out.split('\n').length == 3)
  }
  test("pads cells to the widest row") {
    val out = Fmt.table("T", Seq("c"), Seq(Seq("longvalue")))
    assert(out.split('\n')(1).length == out.split('\n')(3).length)
  }
}
