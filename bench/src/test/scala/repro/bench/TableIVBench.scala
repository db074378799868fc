package repro.bench

import repro.SparkSpec
import repro.exp.TableIV

/** Benchmark harness for Table IV: 4C distillation's effect on the number
  * of candidate views for ChEMBL Q1-Q5 and WDC Q2-Q3 across noise levels.
  * Paper shape: monotone Original ≥ C1 ≥ C2 ≥ C3-worst ≥ C3-best, with
  * compatible-heavy ChEMBL queries (multiple aligned join keys), a
  * containment-heavy WDC Q2, and a WDC Q3 whose worst-case key barely
  * unions while the best-case key collapses the set.
  */
class TableIVBench extends SparkSpec {
  test("Table IV: effect of 4C distillation on #views") {
    val rows = TableIV.run(spark)
    println(TableIV.render(rows))
    assert(rows.size == 7 * 3, "7 queries × 3 noise levels")
    rows.foreach { r =>
      assert(r.c1 <= r.original, s"${r.query}/${r.noise}: C1 prunes")
      assert(r.c2 <= r.c1, s"${r.query}/${r.noise}: C2 prunes further")
      assert(r.c3Worst <= r.c2 && r.c3Best <= r.c3Worst, s"${r.query}/${r.noise}: C3 monotone")
    }
    // ChEMBL Q3: compatible-heavy (three aligned join keys) — C1 prunes a lot.
    val q3 = rows.filter(_.query == "chembl-Q3")
    assert(q3.exists(r => r.c1 <= r.original * 3 / 4), "chembl-Q3 has a large compatible reduction")
    // WDC Q2: containment-heavy — C2 prunes most of what C1 left.
    val wq2 = rows.filter(_.query == "wdc-Q2")
    assert(wq2.exists(r => r.c2 <= r.c1 / 2), "wdc-Q2 has a large contained reduction")
    // WDC Q3: the best-case key unions far more than the worst-case key.
    val wq3 = rows.filter(_.query == "wdc-Q3")
    assert(wq3.exists(r => r.c3Best * 2 <= r.c3Worst),
      "wdc-Q3's best key unions much more than its worst key")
  }
}
