package repro.bench

import repro.SparkSpec
import repro.exp.TableI

/** Benchmark harness for Table I: dataset characteristics (prints the
  * reproduced table and checks its shape — the corpora must differ along
  * the same axes as the paper's: ChEMBL = few tables / few joinable pairs,
  * WDC = many tables / many joinable pairs, Open Data = largest table and
  * column counts).
  */
class TableIBench extends SparkSpec {
  test("Table I: dataset characteristics") {
    val rows = TableI.run(spark)
    println(TableI.render(rows))
    val byName = rows.map(r => r.name -> r).toMap
    val chembl = byName("chembl-lite"); val wdc = byName("wdc-lite"); val od = byName("opendata-lite")
    assert(chembl.tables < wdc.tables, "ChEMBL has far fewer tables than WDC")
    assert(wdc.tables < od.tables, "Open Data is the largest collection by table count")
    assert(chembl.joinablePairs < wdc.joinablePairs,
      "WDC has many more joinable column pairs than ChEMBL (paper: 435 vs 11.6M)")
    assert(od.joinablePairs > wdc.joinablePairs,
      "Open Data has the most joinable pairs (paper: 28.6M vs 11.6M)")
    assert(chembl.rows > wdc.rows / 2,
      "ChEMBL is row-heavy relative to its table count (paper: 140M rows in 70 tables)")
    assert(od.columns > wdc.columns, "Open Data has the largest column count")
  }
}
