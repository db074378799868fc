package repro.bench

import repro.SparkSpec
import repro.core.NoiseLevel
import repro.exp.TableV

/** Benchmark harness for Table V: ground-truth hit ratio of SELECT-ALL /
  * SELECT-BEST / COLUMN-SELECTION over the 150-query noisy workload. Paper
  * shape: all strategies hit at zero noise; SELECT-BEST collapses under
  * noise (1.0 → 0.08 → 0.02) while SELECT-ALL and COLUMN-SELECTION stay
  * near 1.0 — and SELECT-ALL pays with a much larger candidate space.
  */
class TableVBench extends SparkSpec {
  test("Table V: ground-truth hit ratio by strategy and noise level") {
    val cells = TableV.run(spark)
    println(TableV.render(cells))
    def cell(s: String, n: NoiseLevel) = cells.find(c => c.strategy == s && c.noise == n.name).get
    cells.foreach(c => assert(c.total == 50, s"${c.strategy}/${c.noise}: 50 queries per cell"))

    // Zero noise: everything hits.
    for (s <- Seq("SA", "SB", "CS"))
      assert(cell(s, NoiseLevel.Zero).ratio == 1.0, s"$s hits everything at zero noise")
    // SELECT-BEST crumbles as noise grows.
    assert(cell("SB", NoiseLevel.Med).ratio <= 0.4, "SB collapses at medium noise (paper: 0.08)")
    assert(cell("SB", NoiseLevel.High).ratio <= 0.2, "SB collapses at high noise (paper: 0.02)")
    // SELECT-ALL and COLUMN-SELECTION stay robust.
    assert(cell("SA", NoiseLevel.High).ratio >= 0.9, "SA stays near 1.0")
    assert(cell("CS", NoiseLevel.Med).ratio >= 0.9, "CS stays near 1.0 (paper: 1.0)")
    assert(cell("CS", NoiseLevel.High).ratio >= 0.8, "CS stays high (paper: 0.96)")
    // The cost of SELECT-ALL's robustness: a much larger candidate space.
    for (n <- NoiseLevel.all)
      assert(cell("SA", n).meanViews >= 1.5 * cell("CS", n).meanViews,
        s"SA generates a multiple of CS's views at ${n.name} noise")
  }
}
