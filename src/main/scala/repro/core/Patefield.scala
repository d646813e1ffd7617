package repro.core

import scala.util.Random

/** Random r×c contingency tables with fixed row/column marginals,
  * distributed as under random shuffling of the underlying data
  * (Patefield 1981, AS 159; paper § 5).
  *
  * We implement the same sequential conditional scheme AS 159 uses: fill
  * the table row by row; conditioned on what has been placed so far, each
  * row is a multivariate hypergeometric draw, realized cell by cell as
  * univariate hypergeometric draws. Sampling a hypergeometric is done by
  * mode-centred inverse-CDF on the exact log-pmf, so it is fast even for
  * cell counts in the millions (expected work ~ O(sd), not O(N)).
  */
object Patefield {

  /** log C(n, k) via log-gamma. */
  private def logChoose(n: Long, k: Long): Double = {
    if (k < 0 || k > n) Double.NegativeInfinity
    else Gamma.logGamma(n + 1.0) - Gamma.logGamma(k + 1.0) - Gamma.logGamma(n - k + 1.0)
  }

  /** Draw from Hypergeometric(N, K, n): #successes in `n` draws without
    * replacement from a population of `N` with `K` successes.
    */
  def hypergeometric(N: Long, K: Long, n: Long, rng: Random): Long = {
    require(N >= 0 && K >= 0 && n >= 0 && K <= N && n <= N,
      s"bad hypergeometric args N=$N K=$K n=$n")
    val lo = math.max(0L, n + K - N)
    val hi = math.min(n, K)
    if (lo == hi) return lo
    val logDenom = logChoose(N, n)
    def logPmf(k: Long): Double = logChoose(K, k) + logChoose(N - K, n - k) - logDenom

    // start at the mode and expand outwards until the accumulated mass
    // exceeds the uniform draw
    val mode = math.min(hi, math.max(lo, ((n + 1.0) * (K + 1.0) / (N + 2.0)).toLong))
    val u    = rng.nextDouble()
    var acc  = math.exp(logPmf(mode))
    if (u < acc) return mode
    var left  = mode - 1
    var right = mode + 1
    var pl    = if (left >= lo) math.exp(logPmf(left)) else 0.0
    var pr    = if (right <= hi) math.exp(logPmf(right)) else 0.0
    while (left >= lo || right <= hi) {
      if (pr >= pl) {
        acc += pr
        if (u < acc) return right
        right += 1
        pr = if (right <= hi) math.exp(logPmf(right)) else 0.0
        if (right > hi && left < lo) return hi
      } else {
        acc += pl
        if (u < acc) return left
        left -= 1
        pl = if (left >= lo) math.exp(logPmf(left)) else 0.0
        if (left < lo && right > hi) return lo
      }
    }
    mode // numerically unreachable; mass sums to 1
  }

  /** One random table with the given row and column totals. */
  def sample(rowSums: Array[Long], colSums: Array[Long], rng: Random): Array[Array[Long]] = {
    require(rowSums.sum == colSums.sum,
      s"marginal mismatch: ${rowSums.sum} vs ${colSums.sum}")
    val r = rowSums.length; val c = colSums.length
    val out = Array.ofDim[Long](r, c)
    val colRemaining = colSums.clone()
    var totalRemaining = rowSums.sum
    for (i <- 0 until r) {
      // distribute row i over the remaining column capacities: a
      // multivariate hypergeometric draw, realized cell by cell. The
      // population for cell (i, j) is the remaining capacity of columns
      // j..c-1 (columns < j are already fixed for this row).
      var rowRemaining = rowSums(i)
      var pop = totalRemaining
      for (j <- 0 until c - 1) {
        val x = hypergeometric(pop, colRemaining(j), rowRemaining, rng)
        out(i)(j) = x
        rowRemaining -= x
        pop -= colRemaining(j)
      }
      out(i)(c - 1) = rowRemaining
      for (j <- 0 until c) colRemaining(j) -= out(i)(j)
      totalRemaining -= rowSums(i)
    }
    out
  }

  /** Plug-in mutual information (nats) of a dense count matrix — the test
    * statistic recomputed per permutation sample in MIT (Alg. 2 line 5).
    * Uses the Miller-Madow correction to match the observed statistic.
    */
  def tableMi(m: Array[Array[Long]], millerMadow: Boolean = true): Double = {
    val r = m.length; val c = if (r == 0) 0 else m(0).length
    var n = 0L
    val rs = new Array[Long](r); val cs = new Array[Long](c)
    var i = 0
    while (i < r) {
      var j = 0
      while (j < c) { val v = m(i)(j); rs(i) += v; cs(j) += v; n += v; j += 1 }
      i += 1
    }
    if (n == 0) return 0.0
    val nd = n.toDouble
    var mi = 0.0
    var cells = 0
    var rCells = 0
    var cCells = 0
    i = 0
    while (i < r) {
      if (rs(i) > 0) rCells += 1
      var j = 0
      while (j < c) {
        val v = m(i)(j)
        if (v > 0) {
          cells += 1
          mi += (v / nd) * math.log(v * nd / (rs(i).toDouble * cs(j)))
        }
        j += 1
      }
      i += 1
    }
    var j = 0
    while (j < c) { if (cs(j) > 0) cCells += 1; j += 1 }
    if (millerMadow) {
      // Î = Ĥ(X) + Ĥ(Y) − Ĥ(XY), each Miller-Madow corrected
      mi += ((rCells - 1) + (cCells - 1) - (cells - 1)) / (2.0 * nd)
    }
    math.max(0.0, mi)
  }
}
