package repro.core

import org.scalatest.funsuite.AnyFunSuite

class GammaSpec extends AnyFunSuite {

  test("logGamma(1) = 0")  { assert(math.abs(Gamma.logGamma(1.0)) < 1e-12) }
  test("logGamma(2) = 0")  { assert(math.abs(Gamma.logGamma(2.0)) < 1e-12) }
  test("logGamma(5) = log(24)") {
    assert(math.abs(Gamma.logGamma(5.0) - math.log(24.0)) < 1e-10)
  }
  test("logGamma(0.5) = log(sqrt(pi))") {
    assert(math.abs(Gamma.logGamma(0.5) - 0.5 * math.log(math.Pi)) < 1e-10)
  }
  test("logGamma recurrence Γ(x+1) = x·Γ(x)") {
    for (x <- Seq(0.3, 1.7, 4.2, 11.5))
      assert(math.abs(Gamma.logGamma(x + 1) - (math.log(x) + Gamma.logGamma(x))) < 1e-9)
  }
  test("logGamma of large arguments (Stirling regime)") {
    // Γ(171) is near the double overflow point in linear space
    val lg = Gamma.logGamma(171.0)
    assert(lg > 700 && lg < 720)
  }

  test("regularizedGammaP(a, 0) = 0 and → 1 as x → ∞") {
    assert(Gamma.regularizedGammaP(3.0, 0.0) == 0.0)
    assert(Gamma.regularizedGammaP(3.0, 100.0) > 0.999999)
  }
  test("P + Q = 1") {
    for ((a, x) <- Seq((0.5, 0.3), (2.0, 2.0), (7.5, 3.0), (3.0, 11.0)))
      assert(math.abs(Gamma.regularizedGammaP(a, x) + Gamma.regularizedGammaQ(a, x) - 1) < 1e-12)
  }
  test("P(1, x) = 1 − exp(−x)") {
    for (x <- Seq(0.1, 1.0, 2.5, 7.0))
      assert(math.abs(Gamma.regularizedGammaP(1.0, x) - (1 - math.exp(-x))) < 1e-10)
  }

  // Textbook chi-squared critical values
  test("chi2 p-value: df=1 at 3.841 ≈ 0.05") {
    assert(math.abs(Gamma.chiSquaredPValue(3.841, 1) - 0.05) < 2e-4)
  }
  test("chi2 p-value: df=1 at 6.635 ≈ 0.01") {
    assert(math.abs(Gamma.chiSquaredPValue(6.635, 1) - 0.01) < 1e-4)
  }
  test("chi2 p-value: df=2 at 5.991 ≈ 0.05") {
    assert(math.abs(Gamma.chiSquaredPValue(5.991, 2) - 0.05) < 2e-4)
  }
  test("chi2 p-value: df=10 at 18.307 ≈ 0.05") {
    assert(math.abs(Gamma.chiSquaredPValue(18.307, 10) - 0.05) < 3e-4)
  }
  test("chi2 p-value: x = 0 gives 1") {
    assert(Gamma.chiSquaredPValue(0.0, 5) == 1.0)
  }
  test("chi2 p-value decreases in x") {
    val ps = Seq(0.5, 1.0, 2.0, 4.0, 8.0, 16.0).map(Gamma.chiSquaredPValue(_, 3))
    assert(ps == ps.sorted.reverse)
  }
}
