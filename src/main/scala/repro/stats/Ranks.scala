package repro.stats

/** Rank transformations used by the Spearman and RIN estimators (§5.3). */
object Ranks {

  /** Fractional (average) ranks, 1-based: ties receive the mean of the
    * positions they span, the standard convention for Spearman's ρ.
    */
  def averageRanks(xs: Array[Double]): Array[Double] = {
    val n = xs.length
    val idx = Array.range(0, n).sortBy(xs(_))
    val out = new Array[Double](n)
    var i = 0
    while (i < n) {
      var j = i
      while (j + 1 < n && xs(idx(j + 1)) == xs(idx(i))) j += 1
      // positions i..j (0-based) share value; average of 1-based ranks
      val r = (i + j + 2) / 2.0
      var t = i
      while (t <= j) { out(idx(t)) = r; t += 1 }
      i = j + 1
    }
    out
  }

  /** Rankit / RIN transform (Bliss): h(x) = Φ⁻¹((r(x) − 1/2) / n). */
  def rankit(xs: Array[Double]): Array[Double] = {
    val n = xs.length
    averageRanks(xs).map(r => NormalInv.icdf((r - 0.5) / n))
  }
}
