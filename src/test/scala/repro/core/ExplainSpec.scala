package repro.core

import repro.SparkSpec
import scala.util.Random

class ExplainSpec extends SparkSpec {

  /** T depends strongly on Z1, weakly on Z2, not at all on Z3; Y depends
    * on Z1 and T.
    */
  private lazy val stats: MaterializedStats = {
    val rng = new Random(77)
    val counts = scala.collection.mutable.Map.empty[Vector[String], Long].withDefaultValue(0L)
    def flip(v: Int, p: Double) = if (rng.nextDouble() < p) 1 - v else v
    for (_ <- 1 to 40000) {
      val z1 = rng.nextInt(2); val z2 = rng.nextInt(2); val z3 = rng.nextInt(2)
      val t  = flip(z1, 0.15) // strong
      val t2 = if (rng.nextDouble() < 0.15) flip(z2, 0.3) else t // weak z2 touch
      val y  = flip(if (rng.nextDouble() < 0.5) t2 else z1, 0.2)
      counts(Vector(t2.toString, y.toString, z1.toString, z2.toString, z3.toString)) += 1
    }
    new MaterializedStats(ContingencyTable(Vector("T", "Y", "Z1", "Z2", "Z3"), counts.toMap))
  }

  test("responsibilities are normalized to 1") {
    val rs = Explain.responsibilities(stats, "T", Seq("Z1", "Z2", "Z3"))
    assert(math.abs(rs.map(_.rho).sum - 1.0) < 1e-9)
  }
  test("responsibilities are sorted descending") {
    val rs = Explain.responsibilities(stats, "T", Seq("Z1", "Z2", "Z3"))
    assert(rs.map(_.rho) == rs.map(_.rho).sorted.reverse)
  }
  test("the strong covariate gets the highest responsibility") {
    val rs = Explain.responsibilities(stats, "T", Seq("Z1", "Z2", "Z3"))
    assert(rs.head.attribute == "Z1", s"got ${rs}")
    assert(rs.head.rho > 0.6)
  }
  test("an irrelevant covariate gets near-zero responsibility") {
    val rs = Explain.responsibilities(stats, "T", Seq("Z1", "Z2", "Z3"))
    assert(rs.find(_.attribute == "Z3").get.rho < 0.1)
  }
  test("each responsibility is in [0, 1]") {
    val rs = Explain.responsibilities(stats, "T", Seq("Z1", "Z2", "Z3"))
    rs.foreach(r => assert(r.rho >= 0 && r.rho <= 1))
  }
  test("single-variable responsibility is 1") {
    val rs = Explain.responsibilities(stats, "T", Seq("Z1"))
    assert(rs == Seq(rs.head) && math.abs(rs.head.rho - 1.0) < 1e-9)
  }
  test("responsibilities reject an empty variable list") {
    intercept[IllegalArgumentException] { Explain.responsibilities(stats, "T", Nil) }
  }

  test("fine-grained returns at most k triples") {
    assert(Explain.fineGrained(stats, "T", "Y", "Z1", k = 3).size <= 3)
  }
  test("fine-grained triples carry their contributions") {
    val ts = Explain.fineGrained(stats, "T", "Y", "Z1", k = 5)
    assert(ts.exists(t => t.kappaTZ != 0.0))
    assert(ts.exists(t => t.kappaYZ != 0.0))
  }
  test("top fine-grained triple has aligned (T,Z) and (Y,Z) over-representation") {
    // T ≈ Z1 and Y correlated with Z1 ⇒ the top triple should pair equal
    // values (t = z) with an over-represented (y, z) combination
    val top = Explain.fineGrained(stats, "T", "Y", "Z1", k = 1).head
    assert(top.kappaTZ > 0)
    assert(top.kappaYZ > 0)
    assert(top.t == top.z)
  }
  test("Borda score is the sum of the two ranks (sanity: best is small)") {
    val ts = Explain.fineGrained(stats, "T", "Y", "Z1", k = 8)
    assert(ts.head.bordaScore <= ts.last.bordaScore)
    assert(ts.head.bordaScore >= 2) // rank positions start at 1
  }
  test("fine-grained on an independent covariate yields ~zero contributions") {
    val ts = Explain.fineGrained(stats, "T", "Y", "Z3", k = 4)
    ts.foreach { t => assert(math.abs(t.kappaTZ) < 5e-3, s"$t") }
  }
}
