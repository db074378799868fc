package repro.core

import repro.{Oracle, SparkSpec}
import repro.data.TableRepo

/** Tests the Spark MATERIALIZER against the DuckDB oracle: every join graph
  * materialization is checked for result-equality with the equivalent SQL.
  */
class MaterializerSpec extends SparkSpec {
  private def c(t: String, col: String) = ColumnRef(t, col)

  private lazy val repo = TableRepo("mat-test", Map(
    "orders" -> TableRepo.df(spark, Seq("oid", "cid", "status"), Seq(
      Seq("o1", "c1", "open"), Seq("o2", "c1", "closed"), Seq("o3", "c2", "open"),
      Seq("o4", "c9", "open"))),
    "customers" -> TableRepo.df(spark, Seq("cid", "name"), Seq(
      Seq("c1", "alice"), Seq("c2", "bob"), Seq("c3", "carol"))),
    "cities" -> TableRepo.df(spark, Seq("name", "city"), Seq(
      Seq("alice", "paris"), Seq("bob", "tokyo"))),
  ), Vector.empty)

  private val join1 = ViewSpec(Set("orders", "customers"),
    Set(JoinEdge(c("orders", "cid"), c("customers", "cid"))),
    Vector(c("customers", "name"), c("orders", "status")))

  test("two-table join matches DuckDB") {
    Oracle.assertEquivalent(
      Materializer.frame(repo, join1),
      "SELECT DISTINCT customers.name AS name, orders.status AS status " +
        "FROM orders JOIN customers ON orders.cid = customers.cid",
      "orders" -> repo("orders"), "customers" -> repo("customers"))
  }

  test("three-table chain join matches DuckDB") {
    val spec = ViewSpec(Set("orders", "customers", "cities"),
      Set(JoinEdge(c("orders", "cid"), c("customers", "cid")),
          JoinEdge(c("customers", "name"), c("cities", "name"))),
      Vector(c("cities", "city"), c("orders", "status")))
    Oracle.assertEquivalent(
      Materializer.frame(repo, spec),
      "SELECT DISTINCT cities.city AS city, orders.status AS status " +
        "FROM orders JOIN customers ON orders.cid = customers.cid " +
        "JOIN cities ON customers.name = cities.name",
      "orders" -> repo("orders"), "customers" -> repo("customers"), "cities" -> repo("cities"))
  }

  test("single-table projection matches DuckDB") {
    val spec = ViewSpec.singleTable(Vector(c("orders", "cid"), c("orders", "status")))
    Oracle.assertEquivalent(
      Materializer.frame(repo, spec),
      "SELECT DISTINCT cid, status FROM orders",
      "orders" -> repo("orders"))
  }

  test("projection is distinct (set semantics)") {
    val spec = ViewSpec.singleTable(Vector(c("orders", "status")))
    assert(Materializer.frame(repo, spec).count() == 2)
  }

  test("unmatched join keys are dropped (inner join semantics)") {
    val v = Materializer.materialize(repo, join1, "v")
    assert(!v.rows.exists(_.contains("c9")), "order o4 has no matching customer")
    assert(v.rows.size == 3)
  }

  test("materialize collects canonicalized, distinct, sorted rows") {
    val v = Materializer.materialize(repo, join1, "v")
    assert(v.id == "v" && v.schema == Vector("name", "status"))
    assert(v.rows == v.rows.distinct)
    assert(v.rows == v.rows.sorted(Ordering.by((r: Vector[String]) => r.mkString(" "))))
  }

  test("duplicate projected column names get positional suffixes") {
    assert(Materializer.dedupeNames(Vector("s", "s", "t", "s")) == Vector("s", "s_2", "t", "s_3"))
    val spec = ViewSpec(Set("orders", "customers"),
      Set(JoinEdge(c("orders", "cid"), c("customers", "cid"))),
      Vector(c("orders", "cid"), c("customers", "cid")))
    val df = Materializer.frame(repo, spec)
    assert(df.columns.toVector == Vector("cid", "cid_2"))
  }

  test("disconnected specs are rejected") {
    val spec = ViewSpec(Set("orders", "cities"), Set.empty,
      Vector(c("orders", "oid"), c("cities", "city")))
    intercept[RuntimeException](Materializer.frame(repo, spec))
  }

  test("materializeAll preserves ranked order and limit") {
    val single = ViewSpec.singleTable(Vector(c("orders", "oid")))
    val out = Materializer.materializeAll(repo, Seq(single, join1), limit = 1)
    assert(out.size == 1 && out.head.spec == single)
  }

  test("multi-edge connection between two tables joins on all edges") {
    // Both cid and name would have to match; build a repo where they do.
    val r2 = TableRepo("m2", Map(
      "a" -> TableRepo.df(spark, Seq("k1", "k2", "pa"), Seq(
        Seq("x", "1", "p1"), Seq("y", "2", "p2"))),
      "b" -> TableRepo.df(spark, Seq("k1", "k2", "pb"), Seq(
        Seq("x", "1", "q1"), Seq("y", "9", "q2"))),
    ), Vector.empty)
    val spec = ViewSpec(Set("a", "b"),
      Set(JoinEdge(c("a", "k1"), c("b", "k1")), JoinEdge(c("a", "k2"), c("b", "k2"))),
      Vector(c("a", "pa"), c("b", "pb")))
    Oracle.assertEquivalent(
      Materializer.frame(r2, spec),
      "SELECT DISTINCT a.pa AS pa, b.pb AS pb FROM a JOIN b ON a.k1 = b.k1 AND a.k2 = b.k2",
      "a" -> r2("a"), "b" -> r2("b"))
  }
}
