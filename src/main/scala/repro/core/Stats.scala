package repro.core

/** Small statistics helpers for the user-study analysis (Table III). */
object Stats {

  private def logFactorial(n: Int): Double = (2 to n).map(i => math.log(i.toDouble)).sum

  private def logHypergeom(a: Int, b: Int, c: Int, d: Int): Double = {
    val n = a + b + c + d
    logFactorial(a + b) + logFactorial(c + d) + logFactorial(a + c) + logFactorial(b + d) -
      (logFactorial(n) + logFactorial(a) + logFactorial(b) + logFactorial(c) + logFactorial(d))
  }

  /** Two-tailed Fisher exact test for a 2×2 table
    * `[[a, b], [c, d]]` — the test the paper runs on found/not-found
    * counts (reported p = 0.002). Sums the probabilities of all tables
    * with the same margins that are at most as likely as the observed one.
    */
  def fisherExactTwoTailed(a: Int, b: Int, c: Int, d: Int): Double = {
    require(a >= 0 && b >= 0 && c >= 0 && d >= 0)
    val row1 = a + b; val col1 = a + c; val n = a + b + c + d
    val pObs = math.exp(logHypergeom(a, b, c, d))
    val lo = math.max(0, row1 + col1 - n); val hi = math.min(row1, col1)
    val eps = 1e-9
    (lo to hi).map { x =>
      val p = math.exp(logHypergeom(x, row1 - x, col1 - x, n - row1 - col1 + x))
      if (p <= pObs + eps) p else 0.0
    }.sum.min(1.0)
  }

  def median(xs: Seq[Double]): Double = {
    require(xs.nonEmpty)
    val s = xs.sorted
    val n = s.size
    if (n % 2 == 1) s(n / 2) else (s(n / 2 - 1) + s(n / 2)) / 2.0
  }
}
