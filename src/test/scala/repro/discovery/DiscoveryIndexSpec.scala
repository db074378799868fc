package repro.discovery

import repro.SparkSpec
import repro.core.ColumnRef
import repro.data.TableRepo

/** Tests the offline index builder (distributed profiles → online index)
  * end to end on a small repo.
  */
class DiscoveryIndexSpec extends SparkSpec {

  private lazy val repo = TableRepo("idx-test", Map(
    "users"    -> TableRepo.df(spark, Seq("uid", "city"), Seq(
      Seq("u1", "paris"), Seq("u2", "tokyo"), Seq("u3", "lima"))),
    "orders"   -> TableRepo.df(spark, Seq("uid", "item"), Seq(
      Seq("u1", "pen"), Seq("u2", "ink"), Seq("u2", "pad"))),
    "cities"   -> TableRepo.df(spark, Seq("city", "pop"), Seq(
      Seq("paris", "2m"), Seq("tokyo", "14m"), Seq("oslo", "0.7m"))),
    "unrelated" -> TableRepo.df(spark, Seq("w"), Seq(Seq("zzz"))),
  ), Vector.empty)

  private lazy val index = DiscoveryIndexBuilder.build(spark, repo, threshold = 0.6)

  test("every column is profiled, including join-free ones") {
    assert(index.columnValues.keySet == repo.columnRefs.toSet)
  }
  test("values are collected per column") {
    assert(index.values(ColumnRef("users", "city")) == Vector("lima", "paris", "tokyo"))
  }
  test("values rejects unknown columns") {
    intercept[RuntimeException](index.values(ColumnRef("nope", "x")))
  }
  test("joinable pairs respect the threshold") {
    // users.uid {u1,u2,u3} vs orders.uid {u1,u2}: containment max(2/3, 2/2) = 1.0
    assert(index.containmentOf(ColumnRef("users", "uid"), ColumnRef("orders", "uid")) == 1.0)
    // users.city vs cities.city: overlap 2 of 3 → containment 2/3 ≥ 0.6
    assert(index.containmentOf(ColumnRef("users", "city"), ColumnRef("cities", "city")) > 0.6)
  }
  test("below-threshold overlaps are not joinable") {
    val strict = DiscoveryIndexBuilder.build(spark, repo, threshold = 0.8)
    assert(strict.containmentOf(ColumnRef("users", "city"), ColumnRef("cities", "city")) == 0.0)
    assert(strict.containmentOf(ColumnRef("users", "uid"), ColumnRef("orders", "uid")) == 1.0)
  }
  test("searchKeyword over the built index") {
    assert(index.searchKeyword("paris").toSet ==
      Set(ColumnRef("users", "city"), ColumnRef("cities", "city")))
    assert(index.searchKeyword("PARIS").nonEmpty, "case-insensitive")
    assert(index.searchKeyword("absent").isEmpty)
  }
  test("join edges are derived per table pair") {
    assert(index.joinEdges("users", "orders").size == 1)
    assert(index.joinEdges("orders", "users").size == 1, "order-insensitive lookup")
    assert(index.joinEdges("users", "unrelated").isEmpty)
  }
  test("tableNeighbors lists adjacent tables") {
    assert(index.tableNeighbors("users").toSet == Set("orders", "cities"))
    assert(index.tableNeighbors("unrelated").isEmpty)
  }
  test("generateJoinGraphs finds the 2-hop orders—users—cities path") {
    val gs = index.generateJoinGraphs("orders", "cities")
    assert(gs.size == 1 && gs.head.size == 2)
  }
  test("the index build is deterministic") {
    val again = DiscoveryIndexBuilder.build(spark, repo, threshold = 0.6)
    assert(again.columnValues == index.columnValues)
    assert(again.containment == index.containment)
  }
}
