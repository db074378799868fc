package repro.core

import org.scalatest.funsuite.AnyFunSuite

class StatsSpec extends AnyFunSuite {
  test("fisher: paper's table (16/2 vs 6/12) is significant at ~0.002") {
    val p = Stats.fisherExactTwoTailed(16, 2, 6, 12)
    assert(p > 0.0005 && p < 0.005, s"p=$p")
  }
  test("fisher: identical rows are not significant") {
    assert(math.abs(Stats.fisherExactTwoTailed(9, 9, 9, 9) - 1.0) < 1e-9)
  }
  test("fisher: known reference value (tea-tasting 3/1 vs 1/3)") {
    val p = Stats.fisherExactTwoTailed(3, 1, 1, 3)
    assert(math.abs(p - 0.4857) < 0.01, s"p=$p") // classic 8-cup example
  }
  test("fisher: extreme separation is tiny") {
    assert(Stats.fisherExactTwoTailed(18, 0, 0, 18) < 1e-6)
  }
  test("fisher: zeros allowed") {
    assert(Stats.fisherExactTwoTailed(0, 0, 0, 0) == 1.0)
  }
  test("fisher is symmetric under row swap") {
    val p1 = Stats.fisherExactTwoTailed(12, 5, 3, 9)
    val p2 = Stats.fisherExactTwoTailed(3, 9, 12, 5)
    assert(math.abs(p1 - p2) < 1e-9)
  }
  test("median of odd-sized sequence") { assert(Stats.median(Seq(3, 1, 2).map(_.toDouble)) == 2.0) }
  test("median of even-sized sequence averages") { assert(Stats.median(Seq(1.0, 2.0, 3.0, 4.0)) == 2.5) }
  test("median of singleton") { assert(Stats.median(Seq(7.0)) == 7.0) }
  test("median rejects empty input") { intercept[IllegalArgumentException](Stats.median(Seq.empty)) }
}
