package repro.discovery

import org.apache.spark.sql.SparkSession

import repro.core.{ColumnRef, JoinEdge}
import repro.data.TableRepo

/** The online discovery index (Appendix A of the paper): the compact result
  * of the distributed profiling job, serving Aurum's three functions —
  * SEARCH-KEYWORD, NEIGHBORS and GENERATE-JOIN-GRAPHS — to the rest of Ver.
  *
  * @param columnValues distinct values per column
  * @param containment  containment score per canonically-ordered joinable
  *                     column pair (score ≥ `threshold` only)
  * @param threshold    the containment threshold the index was built at
  */
final class DiscoveryIndex(
    val columnValues: Map[ColumnRef, Set[String]],
    val containment: Map[(ColumnRef, ColumnRef), Double],
    val threshold: Double,
) {
  /** Sorted distinct values of a column (workload-generation helper). */
  def values(c: ColumnRef): Vector[String] =
    columnValues.getOrElse(c, sys.error(s"unknown column $c")).toVector.sorted

  /** Case-insensitive value inverted index. */
  private lazy val valueIndex: Map[String, Vector[ColumnRef]] =
    columnValues.toVector
      .flatMap { case (c, vs) => vs.map(v => (v.toLowerCase, c)) }
      .groupBy(_._1)
      .map { case (v, cs) => v -> cs.map(_._2).sortBy(c => (c.table, c.column)) }

  /** SEARCH-KEYWORD(value): columns containing the value (exact match,
    * case-insensitive — see DESIGN.md substitution 6 for the fuzzy case).
    */
  def searchKeyword(value: String): Vector[ColumnRef] =
    valueIndex.getOrElse(value.toLowerCase, Vector.empty)

  /** Attribute-name search: columns whose name contains the keyword. */
  def searchAttribute(keyword: String): Vector[ColumnRef] = {
    val k = keyword.toLowerCase
    columnValues.keys.toVector.filter(_.column.toLowerCase.contains(k))
      .sortBy(c => (c.table, c.column))
  }

  /** NEIGHBORS(c): columns joinable with `c` at the index's threshold. */
  lazy val neighbors: Map[ColumnRef, Set[ColumnRef]] = {
    val sym = containment.keys.toVector.flatMap { case (a, b) => Vector(a -> b, b -> a) }
    sym.groupBy(_._1).map { case (c, ns) => c -> ns.map(_._2).toSet }
      .withDefaultValue(Set.empty)
  }

  def containmentOf(a: ColumnRef, b: ColumnRef): Double =
    containment.getOrElse((a, b), containment.getOrElse((b, a), 0.0))

  /** Join edges grouped by (sorted) table pair. */
  lazy val edgesBetween: Map[(String, String), Vector[JoinEdge]] =
    containment.keys.toVector
      .map { case (a, b) => JoinEdge(a, b) }
      .groupBy(e => { val ts = e.tables.toVector.sorted; (ts(0), ts(1)) })
      .map { case (k, es) => k -> es.distinct.sortBy(_.toString) }
      .withDefaultValue(Vector.empty)

  def joinEdges(t1: String, t2: String): Vector[JoinEdge] = {
    val key = if (t1 <= t2) (t1, t2) else (t2, t1)
    edgesBetween(key)
  }

  /** Tables adjacent to `t` via at least one join edge. */
  lazy val tableNeighbors: Map[String, Vector[String]] =
    edgesBetween.keys.toVector
      .flatMap { case (a, b) => Vector(a -> b, b -> a) }
      .groupBy(_._1)
      .map { case (t, ns) => t -> ns.map(_._2).distinct.sorted }
      .withDefaultValue(Vector.empty)

  /** GENERATE-JOIN-GRAPHS({t1, t2}, ρ): all join graphs with ≤ ρ edges
    * connecting the pair — direct edges plus (for ρ ≥ 2) two-hop paths
    * through one intermediate table. Graphs are ordered smallest-first
    * (paper: "smaller graphs rank higher") and capped at `maxGraphs`, so a
    * cap can never evict a direct join in favour of a longer path.
    */
  def generateJoinGraphs(t1: String, t2: String, rho: Int = 2,
                         maxGraphs: Int = 64): Vector[Set[JoinEdge]] = {
    require(rho >= 1, "rho must be ≥ 1")
    if (t1 == t2) return Vector(Set.empty)
    val direct: Vector[Set[JoinEdge]] = joinEdges(t1, t2).map(e => Set(e))
    val twoHop: Vector[Set[JoinEdge]] =
      if (rho < 2) Vector.empty
      else
        (tableNeighbors(t1).toSet intersect tableNeighbors(t2).toSet)
          .filterNot(x => x == t1 || x == t2).toVector.sorted
          .flatMap { x =>
            for (e1 <- joinEdges(t1, x); e2 <- joinEdges(x, t2)) yield Set(e1, e2)
          }
    (direct ++ twoHop.sortBy(_.toString)).take(maxGraphs)
  }

  /** Connected components of a column set under the NEIGHBORS relation —
    * the clustering step of COLUMN-SELECTION (Algorithm 4, line 5).
    */
  def connectedComponents(cols: Set[ColumnRef]): Vector[Set[ColumnRef]] = {
    var remaining = cols
    val out = Vector.newBuilder[Set[ColumnRef]]
    while (remaining.nonEmpty) {
      var comp = Set(remaining.head)
      var frontier = comp
      while (frontier.nonEmpty) {
        val next = frontier.flatMap(c => neighbors(c)).intersect(remaining) -- comp
        comp ++= next; frontier = next
      }
      out += comp
      remaining --= comp
    }
    out.result().sortBy(_.toVector.map(_.toString).sorted.mkString(","))
  }
}

/** Offline builder: runs the distributed [[Profiles]] job and collects the
  * compact aggregates into a [[DiscoveryIndex]].
  */
object DiscoveryIndexBuilder {
  def build(spark: SparkSession, repo: TableRepo, threshold: Double = 0.8): DiscoveryIndex = {
    val cv = Profiles.columnValues(spark, repo).cache()
    try {
      val colValues: Map[ColumnRef, Set[String]] = cv.collect()
        .map(r => (ColumnRef(r.getString(0), r.getString(1)), r.getString(2)))
        .groupBy(_._1)
        .map { case (c, vs) => c -> vs.map(_._2).toSet }
      // Columns that exist but produced no values still need an entry.
      val allCols = repo.columnRefs.map(c => c -> colValues.getOrElse(c, Set.empty[String])).toMap
      val cont: Map[(ColumnRef, ColumnRef), Double] =
        Profiles.joinablePairs(cv, threshold).collect().map { r =>
          (ColumnRef(r.getString(0), r.getString(1)), ColumnRef(r.getString(2), r.getString(3))) ->
            r.getDouble(5)
        }.toMap
      new DiscoveryIndex(allCols, cont, threshold)
    } finally cv.unpersist()
  }
}
