package repro.core

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class PatefieldSpec extends AnyFunSuite {

  test("hypergeometric respects support bounds") {
    val rng = new Random(1)
    for (_ <- 1 to 200) {
      val x = Patefield.hypergeometric(N = 20, K = 7, n = 9, rng = rng)
      assert(x >= math.max(0, 9 + 7 - 20) && x <= math.min(9, 7))
    }
  }

  test("hypergeometric degenerate cases") {
    val rng = new Random(2)
    assert(Patefield.hypergeometric(10, 0, 5, rng) == 0)
    assert(Patefield.hypergeometric(10, 10, 5, rng) == 5)
    assert(Patefield.hypergeometric(10, 4, 10, rng) == 4)
    assert(Patefield.hypergeometric(10, 4, 0, rng) == 0)
  }

  test("hypergeometric mean matches n·K/N") {
    val rng = new Random(3)
    val draws = (1 to 4000).map(_ => Patefield.hypergeometric(100, 30, 50, rng).toDouble)
    val mean  = draws.sum / draws.size
    assert(math.abs(mean - 15.0) < 0.25, s"mean=$mean") // sd of mean ≈ 0.04
  }

  test("hypergeometric handles very large populations fast") {
    val rng = new Random(4)
    val start = System.nanoTime()
    val x = Patefield.hypergeometric(2000000L, 800000L, 1000000L, rng)
    val ms = (System.nanoTime() - start) / 1e6
    assert(x > 380000 && x < 420000, s"x=$x")  // mean 400 000, sd ≈ 346
    assert(ms < 2000, s"took $ms ms")
  }

  test("sample preserves row and column marginals") {
    val rng = new Random(5)
    val rows = Array(30L, 50L, 20L)
    val cols = Array(40L, 25L, 25L, 10L)
    for (_ <- 1 to 50) {
      val t = Patefield.sample(rows, cols, rng)
      assert(t.map(_.sum).toSeq == rows.toSeq)
      assert(t.transpose.map(_.sum).toSeq == cols.toSeq)
      assert(t.flatten.forall(_ >= 0))
    }
  }

  test("sample rejects mismatched marginals") {
    intercept[IllegalArgumentException] {
      Patefield.sample(Array(10L), Array(5L), new Random(0))
    }
  }

  test("sampled tables have near-zero expected MI (null distribution)") {
    val rng = new Random(6)
    val rows = Array(500L, 500L)
    val cols = Array(600L, 400L)
    val mis = (1 to 300).map(_ => Patefield.tableMi(Patefield.sample(rows, cols, rng)))
    // under independence, 2n·I ~ χ²_1, so E[I] ≈ 1/(2n) = 5e-4 (MM-corrected ~0)
    assert(mis.sum / mis.size < 2e-3, s"mean MI=${mis.sum / mis.size}")
  }

  test("tableMi of a perfectly dependent table equals H") {
    // diagonal table: X == Y, each with prob 1/2 → MI = ln 2
    val t = Array(Array(500L, 0L), Array(0L, 500L))
    assert(math.abs(Patefield.tableMi(t, millerMadow = false) - math.log(2)) < 1e-12)
  }

  test("tableMi of an independent (product) table is zero") {
    // counts = n·p(x)·p(y) exactly
    val t = Array(Array(240L, 160L), Array(360L, 240L))
    assert(Patefield.tableMi(t, millerMadow = false) < 1e-12)
  }

  test("tableMi ignores empty rows/columns") {
    val t = Array(Array(10L, 0L, 5L), Array(0L, 0L, 0L), Array(7L, 0L, 3L))
    val t2 = Array(Array(10L, 5L), Array(7L, 3L))
    assert(math.abs(Patefield.tableMi(t, millerMadow = false) -
                    Patefield.tableMi(t2, millerMadow = false)) < 1e-12)
  }

  test("sample distribution is exchangeable with shuffling (2x2 exact check)") {
    // For marginals r=(2,2), c=(2,2): P(top-left = k) follows the
    // hypergeometric pmf: k=0:1/6, k=1:4/6, k=2:1/6
    val rng = new Random(7)
    val counts = Array.fill(3)(0)
    val trials = 6000
    for (_ <- 1 to trials) {
      val t = Patefield.sample(Array(2L, 2L), Array(2L, 2L), rng)
      counts(t(0)(0).toInt) += 1
    }
    assert(math.abs(counts(0).toDouble / trials - 1.0 / 6) < 0.02)
    assert(math.abs(counts(1).toDouble / trials - 4.0 / 6) < 0.02)
    assert(math.abs(counts(2).toDouble / trials - 1.0 / 6) < 0.02)
  }
}
