package repro.data

import repro.SparkSpec

class OpenDataLiteSpec extends SparkSpec {
  private lazy val repo = OpenDataLite(spark, nFiller = 40)

  test("contains the WDC families, a renamed copy, and fillers") {
    assert(repo.tables.contains("newspapers"))
    assert(repo.tables.contains("od_newspapers"))
    assert(repo.tables.keys.count(_.startsWith("filler_")) == 40)
  }
  test("filler tables have unique-token columns (no joinable pairs)") {
    val f = repo("filler_0").collect()
    assert(f.nonEmpty)
    val firstCol = f.map(_.getString(0))
    assert(firstCol.distinct.length == firstCol.length)
  }
  test("ground truths are inherited from the WDC base") {
    assert(repo.groundTruths.map(_.name) == WdcLite(spark).groundTruths.map(_.name))
  }
  test("the copy shares value universes with the base (cross-copy joins)") {
    val a = repo("newspapers").select("state").distinct().collect().map(_.getString(0)).toSet
    val b = repo("od_newspapers").select("state").distinct().collect().map(_.getString(0)).toSet
    assert(a == b)
  }
  test("deterministic in the seed") {
    val again = OpenDataLite(spark, nFiller = 40)
    assert(again.tables.keySet == repo.tables.keySet)
    assert(again("filler_3").collect().toSeq == repo("filler_3").collect().toSeq)
  }
}
