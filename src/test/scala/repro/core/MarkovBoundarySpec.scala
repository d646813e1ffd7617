package repro.core

import repro.SparkSpec
import repro.causal.{BayesNet, Dag}
import repro.core.IndepTest.Tester

class MarkovBoundarySpec extends SparkSpec {

  // T has parent P, child C, and spouse S (parent of C); N is disconnected.
  private val dag = Dag(Vector("P", "T", "C", "S", "N"),
    Seq("P" -> "T", "T" -> "C", "S" -> "C"))

  private lazy val stats: MaterializedStats = {
    val net = BayesNet(dag, dag.nodes.map(_ -> 2).toMap, Map(
      "P" -> Map(Vector.empty[Int] -> Array(0.5, 0.5)),
      "S" -> Map(Vector.empty[Int] -> Array(0.5, 0.5)),
      "N" -> Map(Vector.empty[Int] -> Array(0.4, 0.6)),
      "T" -> Map(Vector(0) -> Array(0.85, 0.15), Vector(1) -> Array(0.15, 0.85)),
      // parents sorted (S, T)
      "C" -> Map(Vector(0, 0) -> Array(0.9, 0.1), Vector(0, 1) -> Array(0.3, 0.7),
                 Vector(1, 0) -> Array(0.6, 0.4), Vector(1, 1) -> Array(0.05, 0.95))))
    MaterializedStats(net.sample(spark, 30000, seed = 21), dag.nodes)
  }

  private def tester = Tester(method = "chi2", alpha = 0.01)

  test("growShrink recovers the exact Markov boundary of T") {
    val mb = MarkovBoundary.growShrink(stats, "T", tester)
    assert(mb == Set("P", "C", "S"), s"got $mb")
  }
  test("growShrink recovers the boundary of a root node") {
    val mb = MarkovBoundary.growShrink(stats, "P", tester)
    assert(mb == Set("T"), s"got $mb")
  }
  test("growShrink of the disconnected node is empty") {
    assert(MarkovBoundary.growShrink(stats, "N", tester).isEmpty)
  }
  test("growShrink matches the structural boundary (Prop. 2.5)") {
    for (x <- Seq("T", "C", "S")) {
      val mb = MarkovBoundary.growShrink(stats, x, tester)
      assert(mb == dag.markovBoundary(x), s"node $x: $mb vs ${dag.markovBoundary(x)}")
    }
  }

  test("iamb recovers the same boundary as growShrink here") {
    assert(MarkovBoundary.iamb(stats, "T", tester) == Set("P", "C", "S"))
  }
  test("iamb of the disconnected node is empty") {
    assert(MarkovBoundary.iamb(stats, "N", tester).isEmpty)
  }

  test("candidates restriction is honored") {
    val mb = MarkovBoundary.growShrink(stats, "T", tester, Some(Seq("P", "C")))
    assert(mb.subsetOf(Set("P", "C")))
  }

  test("boundary discovery with HyMIT agrees with chi2 on this data") {
    val t = Tester(method = "hymit", alpha = 0.01, m = 100)
    assert(MarkovBoundary.growShrink(stats, "T", t) == Set("P", "C", "S"))
  }
}
