package repro.discovery

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

import repro.data.TableRepo

/** Distributed column profiling over a pathless table collection.
  *
  * This is the offline, heavy part of the DISCOVERY ENGINE (Challenge 2):
  * every table is melted into `(tbl, col, value)` triples with DataFrame
  * ops, and all-pairs column overlaps are computed with a distributed
  * self-join on `value` — the Spark equivalent of Aurum profiling a data
  * lake. The resulting aggregates are small (columns², not rows²) and are
  * collected into the online [[DiscoveryIndex]].
  */
object Profiles {

  /** Melt a whole repo into distinct `(tbl, col, value)` triples. */
  def columnValues(spark: SparkSession, repo: TableRepo): DataFrame = {
    val melted = repo.tables.toSeq.sortBy(_._1).map { case (name, df) =>
      val structs = df.columns.map { cName =>
        struct(lit(name).as("tbl"), lit(cName).as("col"),
          col(cName).cast("string").as("value"))
      }
      df.select(explode(array(structs.toIndexedSeq: _*)).as("x")).select("x.*")
    }
    melted.reduce(_ unionByName _).where(col("value").isNotNull).distinct()
  }

  /** Per-column distinct-value counts: `(tbl, col, distinct_count)`. */
  def columnStats(cv: DataFrame): DataFrame =
    cv.groupBy("tbl", "col").agg(count(lit(1)).as("distinct_count"))

  /** All-pairs column overlap and Lazo-style maximum directional Jaccard
    * containment `max(|a∩b|/|a|, |a∩b|/|b|)`, one row per unordered pair of
    * columns from *different* tables with overlap ≥ 1:
    * `(tbl1, col1, tbl2, col2, overlap, containment)`.
    */
  def columnPairs(cv: DataFrame): DataFrame = {
    val stats = columnStats(cv)
    val a = cv.select(col("tbl").as("tbl1"), col("col").as("col1"), col("value"))
    val b = cv.select(col("tbl").as("tbl2"), col("col").as("col2"), col("value"))
    val pairs = a.join(b, "value")
      // canonical order keeps one row per unordered pair; same-table pairs
      // are excluded because Ver never self-joins a table.
      .where(col("tbl1") =!= col("tbl2") &&
        concat_ws(".", col("tbl1"), col("col1")) < concat_ws(".", col("tbl2"), col("col2")))
      .groupBy("tbl1", "col1", "tbl2", "col2")
      .agg(count(lit(1)).as("overlap"))
    pairs
      .join(stats.withColumnRenamed("tbl", "tbl1").withColumnRenamed("col", "col1")
        .withColumnRenamed("distinct_count", "d1"), Seq("tbl1", "col1"))
      .join(stats.withColumnRenamed("tbl", "tbl2").withColumnRenamed("col", "col2")
        .withColumnRenamed("distinct_count", "d2"), Seq("tbl2", "col2"))
      .withColumn("containment",
        greatest(col("overlap") / col("d1"), col("overlap") / col("d2")))
      .select("tbl1", "col1", "tbl2", "col2", "overlap", "containment")
  }

  /** Joinable pairs at a containment threshold (Aurum NEIGHBORS edges). */
  def joinablePairs(cv: DataFrame, threshold: Double): DataFrame =
    columnPairs(cv).where(col("containment") >= threshold)
}
