package repro.core

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class IndepTestSpec extends AnyFunSuite {

  /** Sample a 3-variable dataset into a contingency table.
    * structure: "chain" X→Z→Y, "collider" X→Z←Y, "confounder" X←Z→Y,
    * "direct" X→Y (Z independent).
    */
  private def gen(structure: String, n: Int, seed: Long, noise: Double = 0.15)
      : MaterializedStats = {
    val rng = new Random(seed)
    val counts = scala.collection.mutable.Map.empty[Vector[String], Long].withDefaultValue(0L)
    def flip(v: Int, p: Double) = if (rng.nextDouble() < p) 1 - v else v
    for (_ <- 1 to n) {
      val (x, y, z) = structure match {
        case "chain" =>
          val x = rng.nextInt(2); val z = flip(x, noise); val y = flip(z, noise)
          (x, y, z)
        case "collider" =>
          val x = rng.nextInt(2); val y = rng.nextInt(2)
          val z = flip(x ^ y, noise)
          (x, y, z)
        case "confounder" =>
          val z = rng.nextInt(2); val x = flip(z, noise); val y = flip(z, noise)
          (x, y, z)
        case "direct" =>
          val x = rng.nextInt(2); val y = flip(x, noise); val z = rng.nextInt(2)
          (x, y, z)
        case "independent" =>
          (rng.nextInt(2), rng.nextInt(2), rng.nextInt(2))
      }
      counts(Vector(x.toString, y.toString, z.toString)) += 1
    }
    new MaterializedStats(ContingencyTable(Vector("X", "Y", "Z"), counts.toMap))
  }

  // ---------------------------------------------------------------- χ² --

  test("chi2 rejects independence for directly dependent variables") {
    val s = gen("direct", 5000, 1)
    assert(IndepTest.chi2(s, "X", "Y", Nil).pValue < 0.001)
  }
  test("chi2 retains independence for independent variables") {
    val s = gen("independent", 5000, 2)
    assert(IndepTest.chi2(s, "X", "Y", Nil).pValue > 0.01)
  }
  test("chi2 conditional: chain X->Z->Y gives X ⊥ Y | Z") {
    val s = gen("chain", 20000, 3)
    assert(IndepTest.chi2(s, "X", "Y", Nil).pValue < 0.001)       // marginally dep.
    assert(IndepTest.chi2(s, "X", "Y", Seq("Z")).pValue > 0.01)   // cond. indep.
  }
  test("chi2 conditional: collider X->Z<-Y gives X ⊥ Y but X ⊮ Y | Z") {
    val s = gen("collider", 20000, 4)
    assert(IndepTest.chi2(s, "X", "Y", Nil).pValue > 0.01)
    assert(IndepTest.chi2(s, "X", "Y", Seq("Z")).pValue < 0.001)
  }
  test("chi2 confounder: X ⊥ Y | Z for common cause") {
    val s = gen("confounder", 20000, 5)
    assert(IndepTest.chi2(s, "X", "Y", Nil).pValue < 0.001)
    assert(IndepTest.chi2(s, "X", "Y", Seq("Z")).pValue > 0.01)
  }

  // --------------------------------------------------------------- MIT --

  test("MIT rejects independence for dependent variables") {
    val s = gen("direct", 3000, 6)
    val r = IndepTest.mit(s, "X", "Y", Nil, m = 200)
    assert(r.pValue < 0.01, s"p=${r.pValue}")
  }
  test("MIT retains independence for independent variables") {
    val s = gen("independent", 3000, 7)
    val r = IndepTest.mit(s, "X", "Y", Nil, m = 200)
    assert(r.pValue > 0.05, s"p=${r.pValue}")
  }
  test("MIT conditional chain: X ⊥ Y | Z") {
    val s = gen("chain", 10000, 8)
    assert(IndepTest.mit(s, "X", "Y", Seq("Z"), m = 200).pValue > 0.05)
  }
  test("MIT conditional collider: X ⊮ Y | Z") {
    val s = gen("collider", 10000, 9)
    assert(IndepTest.mit(s, "X", "Y", Seq("Z"), m = 200).pValue < 0.01)
  }
  test("MIT p-value CI brackets the estimate") {
    val s = gen("independent", 2000, 10)
    val r = IndepTest.mit(s, "X", "Y", Nil, m = 100)
    assert(r.ciLow <= r.pValue && r.pValue <= r.ciHigh)
    assert(r.ciLow >= 0 && r.ciHigh <= 1)
  }
  test("MIT under the null has roughly uniform p-values (no systematic bias)") {
    val ps = (1 to 30).map { i =>
      IndepTest.mit(gen("independent", 800, 100 + i), "X", "Y", Nil, m = 60,
                    rng = new Random(i)).pValue
    }
    // under H0 about half the p-values should exceed 0.5
    val frac = ps.count(_ > 0.4).toDouble / ps.size
    assert(frac > 0.3, s"p-values look biased low: $ps")
  }
  test("MIT agrees with chi2 on large-sample cases") {
    for ((structure, dep) <- Seq(("direct", true), ("independent", false))) {
      val s = gen(structure, 8000, 11)
      val pChi = IndepTest.chi2(s, "X", "Y", Nil).pValue
      val pMit = IndepTest.mit(s, "X", "Y", Nil, m = 200).pValue
      assert((pChi < 0.01) == dep && (pMit < 0.01) == dep)
    }
  }

  // --------------------------------------------- MIT with group sampling --

  test("MIT with group sampling preserves the collider verdict") {
    val s = gen("collider", 10000, 12)
    val r = IndepTest.mit(s, "X", "Y", Seq("Z"), m = 150, groupFraction = 0.5)
    assert(r.pValue < 0.01)
    assert(r.method == "mit-sampled")
  }
  test("MIT with group sampling preserves the chain verdict") {
    val s = gen("chain", 10000, 13)
    val r = IndepTest.mit(s, "X", "Y", Seq("Z"), m = 150, groupFraction = 0.5)
    assert(r.pValue > 0.05)
  }

  // ------------------------------------------------------------- HyMIT --

  test("HyMIT uses chi2 when df is small relative to n") {
    val s = gen("direct", 5000, 14)
    val r = IndepTest.hymit(s, "X", "Y", Nil) // df = 1 << n/5
    assert(r.method == "chi2")
  }
  test("HyMIT falls back to MIT when df is large relative to n") {
    // binary X,Y with a 12-category Z and n = 48: df = 12 > 48/5
    val rng = new Random(15)
    val counts = (for (z <- 0 until 12; _ <- 1 to 4) yield
      Vector(rng.nextInt(2).toString, rng.nextInt(2).toString, z.toString))
      .groupBy(identity).map { case (k, g) => k -> g.size.toLong }
    val s = new MaterializedStats(ContingencyTable(Vector("X", "Y", "Z"), counts))
    val r = IndepTest.hymit(s, "X", "Y", Seq("Z"), beta = 5.0, m = 50)
    assert(r.method.startsWith("mit"))
  }
  test("HyMIT verdicts match ground truth on all structures") {
    val cases = Seq(
      ("chain", Seq.empty[String], true), ("chain", Seq("Z"), false),
      ("collider", Seq.empty[String], false), ("collider", Seq("Z"), true),
      ("confounder", Seq.empty[String], true), ("confounder", Seq("Z"), false))
    for ((structure, z, dep) <- cases) {
      val s = gen(structure, 20000, 16)
      val r = IndepTest.hymit(s, "X", "Y", z, m = 150)
      assert(r.dependent(0.01) == dep, s"$structure | $z: p=${r.pValue}")
    }
  }

  // -------------------------------------------------------------- Tester --

  test("Tester counts tests and is deterministic per seed") {
    val s = gen("direct", 2000, 17)
    val t = IndepTest.Tester(method = "mit", m = 80, seed = 5)
    val before = t.counter.tests
    val r1 = t.run(s, "X", "Y", Nil)
    assert(t.counter.tests == before + 1)
    val t2 = IndepTest.Tester(method = "mit", m = 80, seed = 5)
    val r2 = t2.run(s, "X", "Y", Nil)
    assert(r1.pValue == r2.pValue)
  }
  test("Tester rejects unknown method") {
    val s = gen("direct", 100, 18)
    intercept[IllegalArgumentException] {
      IndepTest.Tester(method = "bogus").run(s, "X", "Y", Nil)
    }
  }
}
