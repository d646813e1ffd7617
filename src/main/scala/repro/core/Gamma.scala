package repro.core

/** Special functions needed for the χ² test p-values. The offline image
  * carries no stats library usable at compile scope, so we implement the
  * standard Lanczos log-gamma and the regularized incomplete gamma
  * (series + continued-fraction forms, Numerical-Recipes style).
  */
object Gamma {

  private val lanczos = Array(
    676.5203681218851, -1259.1392167224028, 771.32342877765313,
    -176.61502916214059, 12.507343278686905, -0.13857109526572012,
    9.9843695780195716e-6, 1.5056327351493116e-7)

  /** Natural log of the Gamma function, x > 0. */
  def logGamma(x: Double): Double = {
    require(x > 0, s"logGamma requires x > 0, got $x")
    if (x < 0.5) {
      // reflection formula
      math.log(math.Pi / math.sin(math.Pi * x)) - logGamma(1.0 - x)
    } else {
      val z = x - 1.0
      var a = 0.99999999999980993
      for (i <- lanczos.indices) a += lanczos(i) / (z + i + 1)
      val t = z + lanczos.length - 0.5
      0.5 * math.log(2 * math.Pi) + (z + 0.5) * math.log(t) - t + math.log(a)
    }
  }

  /** Regularized lower incomplete gamma P(a, x). */
  def regularizedGammaP(a: Double, x: Double): Double = {
    require(a > 0 && x >= 0, s"invalid args a=$a x=$x")
    if (x == 0) 0.0
    else if (x < a + 1.0) gammaSeries(a, x)
    else 1.0 - gammaContinuedFraction(a, x)
  }

  /** Regularized upper incomplete gamma Q(a, x) = 1 − P(a, x). */
  def regularizedGammaQ(a: Double, x: Double): Double = 1.0 - regularizedGammaP(a, x)

  private def gammaSeries(a: Double, x: Double): Double = {
    var ap  = a
    var sum = 1.0 / a
    var del = sum
    var i   = 0
    while (i < 1000 && math.abs(del) >= math.abs(sum) * 1e-14) {
      ap += 1; del *= x / ap; sum += del; i += 1
    }
    sum * math.exp(-x + a * math.log(x) - logGamma(a))
  }

  private def gammaContinuedFraction(a: Double, x: Double): Double = {
    val fpmin = 1e-300
    var b = x + 1.0 - a
    var c = 1.0 / fpmin
    var d = 1.0 / b
    var h = d
    var i = 1
    var del = 0.0
    do {
      val an = -i * (i - a)
      b += 2.0
      d = an * d + b; if (math.abs(d) < fpmin) d = fpmin
      c = b + an / c; if (math.abs(c) < fpmin) c = fpmin
      d = 1.0 / d
      del = d * c
      h *= del
      i += 1
    } while (i < 1000 && math.abs(del - 1.0) > 1e-14)
    math.exp(-x + a * math.log(x) - logGamma(a)) * h
  }

  /** Upper-tail p-value of the χ² distribution with `df` degrees of
    * freedom at statistic value `x`: P[Χ² ≥ x].
    */
  def chiSquaredPValue(x: Double, df: Double): Double = {
    require(df > 0, s"df must be > 0, got $df")
    if (x <= 0) 1.0 else regularizedGammaQ(df / 2.0, x / 2.0)
  }
}
