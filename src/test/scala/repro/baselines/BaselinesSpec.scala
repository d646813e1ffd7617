package repro.baselines

import repro.SparkSpec
import repro.causal.{BayesNet, Dag}
import repro.core.{MaterializedStats, IndepTest}
import repro.core.IndepTest.Tester

class BaselinesSpec extends SparkSpec {

  // Z → T ← W, T → Y, Z → Y (same net as CDSpec)
  private val dag = Dag(Vector("Z", "W", "T", "Y"),
    Seq("Z" -> "T", "W" -> "T", "T" -> "Y", "Z" -> "Y"))

  private lazy val stats: MaterializedStats = {
    val net = BayesNet(dag, dag.nodes.map(_ -> 2).toMap, Map(
      "Z" -> Map(Vector.empty[Int] -> Array(0.5, 0.5)),
      "W" -> Map(Vector.empty[Int] -> Array(0.6, 0.4)),
      "T" -> Map(Vector(0, 0) -> Array(0.85, 0.15), Vector(0, 1) -> Array(0.35, 0.65),
                 Vector(1, 0) -> Array(0.6, 0.4), Vector(1, 1) -> Array(0.1, 0.9)),
      "Y" -> Map(Vector(0, 0) -> Array(0.8, 0.2), Vector(0, 1) -> Array(0.55, 0.45),
                 Vector(1, 0) -> Array(0.45, 0.55), Vector(1, 1) -> Array(0.15, 0.85))))
    MaterializedStats(net.sample(spark, 40000, seed = 41), dag.nodes)
  }

  private def tester = Tester(method = "chi2", alpha = 0.01)

  test("FGS recovers the skeleton") {
    val l = StructureLearning.fgs(stats, tester)
    val expected = Set(("T", "Z"), ("T", "W"), ("T", "Y"), ("Y", "Z"))
      .map { case (a, b) => if (a < b) (a, b) else (b, a) }
    assert(l.undirected == expected, s"got ${l.undirected}")
  }

  test("FGS orients the collider at T") {
    val l = StructureLearning.fgs(stats, tester)
    assert(l.oriented.contains("Z" -> "T") || l.oriented.contains("W" -> "T"),
      s"oriented=${l.oriented}")
    assert(l.parents("T").subsetOf(Set("Z", "W")))
  }

  test("IAMB produces the same skeleton here") {
    val l = StructureLearning.iamb(stats, tester)
    assert(l.undirected == StructureLearning.fgs(stats, tester).undirected)
  }

  test("Learned.neighborsOf is symmetric") {
    val l = StructureLearning.fgs(stats, tester)
    for (a <- l.nodes; b <- l.neighborsOf(a)) assert(l.neighborsOf(b).contains(a))
  }

  test("hill climbing with BIC recovers the skeleton as undirected equivalence") {
    val r = ScoreSearch.hillClimb(stats, ScoreSearch.BIC)
    val undirected = r.edges.map { case (a, b) => if (a < b) (a, b) else (b, a) }
    val expected = Set(("T", "Z"), ("T", "W"), ("T", "Y"), ("Y", "Z"))
      .map { case (a, b) => if (a < b) (a, b) else (b, a) }
    assert(undirected == expected, s"got $undirected")
  }

  test("hill climbing scores improve monotonically vs the empty graph") {
    val empty = stats.attributes.map(x =>
      // family score of isolated node via a 1-edge-less run is implicit;
      // just assert search found something better than "no edges"
      x).size
    val r = ScoreSearch.hillClimb(stats, ScoreSearch.BIC)
    assert(r.edges.nonEmpty)
    assert(empty == 4)
  }

  test("AIC finds at least the BIC edges (less penalty, denser graphs)") {
    val bic = ScoreSearch.hillClimb(stats, ScoreSearch.BIC)
    val aic = ScoreSearch.hillClimb(stats, ScoreSearch.AIC)
    def und(s: Set[(String, String)]) = s.map { case (a, b) => if (a < b) (a, b) else (b, a) }
    assert(und(bic.edges).subsetOf(und(aic.edges)))
  }

  test("BDe search runs and yields an acyclic graph") {
    val r = ScoreSearch.hillClimb(stats, ScoreSearch.BDe)
    val d = Dag(stats.attributes.toVector, r.edges)
    assert(d.isAcyclic)
    assert(r.edges.nonEmpty)
  }

  test("maxParents cap is honored") {
    val r = ScoreSearch.hillClimb(stats, ScoreSearch.AIC, maxParents = 1)
    for (n <- stats.attributes) assert(r.parents(n).size <= 1)
  }

  test("F1 of CD beats or matches FGS on this collider-rich graph") {
    val cdRes = repro.core.CD.covariates(stats, "T", "Y",
      repro.core.CD.Config(tester = Tester(method = "chi2")))
    val fgsRes = StructureLearning.fgs(stats, Tester(method = "chi2"))
    def f1(pred: Set[String], truth: Set[String]): Double = {
      if (pred.isEmpty && truth.isEmpty) return 1.0
      val tp = (pred & truth).size.toDouble
      if (tp == 0) return 0.0
      val p = tp / pred.size; val r = tp / truth.size
      2 * p * r / (p + r)
    }
    val truth = Set("Z", "W")
    assert(f1(cdRes.covariates, truth) >= f1(fgsRes.parents("T"), truth))
  }
}
