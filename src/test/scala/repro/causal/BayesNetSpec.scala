package repro.causal

import org.apache.spark.sql.functions._
import repro.SparkSpec
import repro.core.{Contingency, Entropy, MaterializedStats, IndepTest}

class BayesNetSpec extends SparkSpec {

  private val chainDag = Dag.fromEdges("A" -> "B", "B" -> "C")

  test("sample has requested row count and columns") {
    val net = BayesNet.random(chainDag, card = 2, seed = 1)
    val df  = net.sample(spark, 500, seed = 1)
    assert(df.count() == 500)
    assert(df.columns.toSet == Set("A", "B", "C"))
  }

  test("sample is deterministic in the seed") {
    val net = BayesNet.random(chainDag, 2, seed = 2)
    val a = net.sample(spark, 300, seed = 7).collect().map(_.toSeq).toSeq
    val b = net.sample(spark, 300, seed = 7).collect().map(_.toSeq).toSeq
    assert(a == b)
  }

  test("root node marginal matches its CPT") {
    val net = BayesNet(chainDag, Map("A" -> 2, "B" -> 2, "C" -> 2), Map(
      "A" -> Map(Vector.empty[Int] -> Array(0.8, 0.2)),
      "B" -> Map(Vector(0) -> Array(0.9, 0.1), Vector(1) -> Array(0.1, 0.9)),
      "C" -> Map(Vector(0) -> Array(0.5, 0.5), Vector(1) -> Array(0.5, 0.5))))
    val df = net.sample(spark, 20000, seed = 3)
    val p1 = df.filter(col("A") === "1").count().toDouble / 20000
    assert(math.abs(p1 - 0.2) < 0.015, s"P(A=1)=$p1")
  }

  test("conditional distribution matches its CPT") {
    val net = BayesNet(chainDag, Map("A" -> 2, "B" -> 2, "C" -> 2), Map(
      "A" -> Map(Vector.empty[Int] -> Array(0.5, 0.5)),
      "B" -> Map(Vector(0) -> Array(0.9, 0.1), Vector(1) -> Array(0.25, 0.75)),
      "C" -> Map(Vector(0) -> Array(0.5, 0.5), Vector(1) -> Array(0.5, 0.5))))
    val df = net.sample(spark, 20000, seed = 4)
    val b1a0 = df.filter(col("A") === "0" && col("B") === "1").count().toDouble /
               df.filter(col("A") === "0").count()
    val b1a1 = df.filter(col("A") === "1" && col("B") === "1").count().toDouble /
               df.filter(col("A") === "1").count()
    assert(math.abs(b1a0 - 0.1) < 0.02, s"P(B=1|A=0)=$b1a0")
    assert(math.abs(b1a1 - 0.75) < 0.02, s"P(B=1|A=1)=$b1a1")
  }

  test("chain sample satisfies the DAG's independences") {
    val net = BayesNet(chainDag, Map("A" -> 2, "B" -> 2, "C" -> 2), Map(
      "A" -> Map(Vector.empty[Int] -> Array(0.5, 0.5)),
      "B" -> Map(Vector(0) -> Array(0.85, 0.15), Vector(1) -> Array(0.15, 0.85)),
      "C" -> Map(Vector(0) -> Array(0.85, 0.15), Vector(1) -> Array(0.15, 0.85))))
    val df = net.sample(spark, 30000, seed = 5)
    val stats = MaterializedStats(df, Seq("A", "B", "C"))
    assert(IndepTest.chi2(stats, "A", "C", Nil).pValue < 0.001)       // dependent
    assert(IndepTest.chi2(stats, "A", "C", Seq("B")).pValue > 0.01)   // A ⊥ C | B
  }

  test("collider sample: parents independent until conditioned") {
    val vDag = Dag.fromEdges("X" -> "Z", "Y" -> "Z")
    val net = BayesNet(vDag, Map("X" -> 2, "Y" -> 2, "Z" -> 2), Map(
      "X" -> Map(Vector.empty[Int] -> Array(0.5, 0.5)),
      "Y" -> Map(Vector.empty[Int] -> Array(0.5, 0.5)),
      // parents sorted (X, Y): Z ≈ X xor Y
      "Z" -> Map(Vector(0, 0) -> Array(0.9, 0.1), Vector(0, 1) -> Array(0.1, 0.9),
                 Vector(1, 0) -> Array(0.1, 0.9), Vector(1, 1) -> Array(0.9, 0.1))))
    val df = net.sample(spark, 30000, seed = 6)
    val stats = MaterializedStats(df, Seq("X", "Y", "Z"))
    assert(IndepTest.chi2(stats, "X", "Y", Nil).pValue > 0.01)
    assert(IndepTest.chi2(stats, "X", "Y", Seq("Z")).pValue < 0.001)
  }

  test("random CPTs: probabilities are normalized") {
    val net = BayesNet.random(RandomDag.generate(8, 1.5, 3), card = 3, seed = 7)
    for ((_, rows) <- net.cpt; (_, probs) <- rows) {
      assert(math.abs(probs.sum - 1.0) < 1e-9)
      assert(probs.forall(p => p >= 0 && p <= 1))
    }
  }

  test("random BayesNet with mixed cardinalities samples all levels") {
    val dag = Dag.fromEdges("A" -> "B")
    val net = BayesNet.random(dag, Map("A" -> 4, "B" -> 3), seed = 8, alpha = 5.0)
    val df  = net.sample(spark, 5000, seed = 8)
    val aLevels = df.select("A").distinct().count()
    val bLevels = df.select("B").distinct().count()
    assert(aLevels == 4 && bLevels == 3)
  }
}
