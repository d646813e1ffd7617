package repro.core

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class EntropySpec extends AnyFunSuite {

  private def table1(counts: (String, Long)*): ContingencyTable =
    ContingencyTable(Vector("X"), counts.map { case (k, c) => Vector(k) -> c }.toMap)

  private def table2(counts: ((String, String), Long)*): ContingencyTable =
    ContingencyTable(Vector("X", "Y"),
      counts.map { case ((a, b), c) => Vector(a, b) -> c }.toMap)

  test("MLE entropy of uniform distribution is log k") {
    val ct = table1("a" -> 25, "b" -> 25, "c" -> 25, "d" -> 25)
    assert(math.abs(Entropy.mle(ct) - math.log(4)) < 1e-12)
  }
  test("MLE entropy of a point mass is 0") {
    assert(Entropy.mle(table1("a" -> 100)) == 0.0)
  }
  test("MLE entropy of empty table is 0") {
    assert(Entropy.mle(ContingencyTable(Vector("X"), Map.empty)) == 0.0)
  }
  test("Miller-Madow adds (m-1)/(2n)") {
    val ct = table1("a" -> 30, "b" -> 70)
    assert(math.abs(Entropy.millerMadow(ct) - (Entropy.mle(ct) + 1.0 / 200)) < 1e-12)
  }
  test("entropy is maximal for uniform among same-support tables") {
    val u = table1("a" -> 50, "b" -> 50)
    val s = table1("a" -> 90, "b" -> 10)
    assert(Entropy.mle(u) > Entropy.mle(s))
  }

  test("conditional entropy H(X|X) = 0 (via joint)") {
    val ct = table2(("a", "a") -> 40L, ("b", "b") -> 60L)
    val h = Entropy.conditional(ct, Seq("X"), Seq("Y"))
    assert(math.abs(h) < 1e-9) // X determined by Y
  }

  test("CMI of independent product table is ~0 (MLE part)") {
    // exact product: P(x,y) = P(x)P(y)
    val ct = table2(("a", "u") -> 120L, ("a", "v") -> 80L,
                    ("b", "u") -> 180L, ("b", "v") -> 120L)
    // Miller-Madow corrections don't cancel exactly; allow small slack
    assert(Entropy.cmi(ct, Seq("X"), Seq("Y"), Nil) < 5e-3)
  }

  test("MI of deterministic copy equals entropy") {
    val ct = table2(("a", "a") -> 50L, ("b", "b") -> 50L)
    val mi = Entropy.cmi(ct, Seq("X"), Seq("Y"), Nil)
    assert(math.abs(mi - Entropy.millerMadow(ct, Seq("X"))) < 1e-9)
  }

  test("CMI is non-negative by clamping") {
    val rng = new Random(0)
    for (_ <- 1 to 20) {
      val ct = table2(
        ("a", "u") -> (rng.nextInt(50) + 1).toLong,
        ("a", "v") -> (rng.nextInt(50) + 1).toLong,
        ("b", "u") -> (rng.nextInt(50) + 1).toLong,
        ("b", "v") -> (rng.nextInt(50) + 1).toLong)
      assert(Entropy.cmi(ct, Seq("X"), Seq("Y"), Nil) >= 0.0)
    }
  }

  test("chain: I(X;Y|Z)=0 for X -> Z -> Y generated data") {
    // X uniform; Z = X flipped w.p. 0.2; Y = Z flipped w.p. 0.2
    val rng = new Random(42)
    val counts = scala.collection.mutable.Map.empty[Vector[String], Long].withDefaultValue(0L)
    for (_ <- 1 to 30000) {
      val x = rng.nextInt(2)
      val z = if (rng.nextDouble() < 0.2) 1 - x else x
      val y = if (rng.nextDouble() < 0.2) 1 - z else z
      counts(Vector(x.toString, y.toString, z.toString)) += 1
    }
    val ct = ContingencyTable(Vector("X", "Y", "Z"), counts.toMap)
    val iXYgZ = Entropy.cmi(ct, Seq("X"), Seq("Y"), Seq("Z"))
    val iXY   = Entropy.cmi(ct, Seq("X"), Seq("Y"), Nil)
    assert(iXYgZ < 0.001, s"I(X;Y|Z)=$iXYgZ should be ~0")
    assert(iXY > 0.05, s"I(X;Y)=$iXY should be large")
  }

  test("contributions sum to MLE mutual information") {
    val ct = table2(("a", "u") -> 30L, ("a", "v") -> 10L,
                    ("b", "u") -> 20L, ("b", "v") -> 40L)
    val ks = Entropy.contributions(ct, "X", "Y")
    val miMle = {
      val hx = Entropy.mle(ct.marginal(Seq("X")))
      val hy = Entropy.mle(ct.marginal(Seq("Y")))
      val hxy = Entropy.mle(ct)
      hx + hy - hxy
    }
    assert(math.abs(ks.values.sum - miMle) < 1e-12)
  }

  test("contribution signs: over-represented pairs positive") {
    val ct = table2(("a", "u") -> 45L, ("a", "v") -> 5L,
                    ("b", "u") -> 5L, ("b", "v") -> 45L)
    val ks = Entropy.contributions(ct, "X", "Y")
    assert(ks(("a", "u")) > 0 && ks(("b", "v")) > 0)
    assert(ks(("a", "v")) < 0 && ks(("b", "u")) < 0)
  }

  test("contributions of independent table are ~0") {
    val ct = table2(("a", "u") -> 60L, ("a", "v") -> 40L,
                    ("b", "u") -> 30L, ("b", "v") -> 20L)
    Entropy.contributions(ct, "X", "Y").values.foreach(k => assert(math.abs(k) < 1e-12))
  }
}
