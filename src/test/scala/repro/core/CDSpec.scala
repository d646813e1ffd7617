package repro.core

import org.apache.spark.sql.functions._
import repro.SparkSpec
import repro.causal.{BayesNet, Dag}
import repro.core.IndepTest.Tester

class CDSpec extends SparkSpec {

  // Classic confounded treatment: Z → T ← W (non-adjacent parents),
  // T → Y, Z → Y. PA_T = {Z, W} is discoverable (Prop. 4.1).
  private val dag = Dag(Vector("Z", "W", "T", "Y"),
    Seq("Z" -> "T", "W" -> "T", "T" -> "Y", "Z" -> "Y"))

  private lazy val stats: MaterializedStats = {
    val net = BayesNet(dag, dag.nodes.map(_ -> 2).toMap, Map(
      "Z" -> Map(Vector.empty[Int] -> Array(0.5, 0.5)),
      "W" -> Map(Vector.empty[Int] -> Array(0.6, 0.4)),
      // parents sorted (W, Z)
      "T" -> Map(Vector(0, 0) -> Array(0.85, 0.15), Vector(0, 1) -> Array(0.35, 0.65),
                 Vector(1, 0) -> Array(0.6, 0.4), Vector(1, 1) -> Array(0.1, 0.9)),
      // parents sorted (T, Z)
      "Y" -> Map(Vector(0, 0) -> Array(0.8, 0.2), Vector(0, 1) -> Array(0.55, 0.45),
                 Vector(1, 0) -> Array(0.45, 0.55), Vector(1, 1) -> Array(0.15, 0.85))))
    MaterializedStats(net.sample(spark, 40000, seed = 31), dag.nodes)
  }

  private def cfg = CD.Config(tester = Tester(method = "chi2", alpha = 0.01))

  test("CD recovers both non-adjacent parents of T") {
    val res = CD.covariates(stats, "T", "Y", cfg)
    assert(res.covariates == Set("Z", "W"), s"got ${res.covariates}")
    assert(!res.usedFallback)
  }

  test("CD result excludes the outcome") {
    val res = CD.covariates(stats, "T", "Y", cfg)
    assert(!res.covariates.contains("Y"))
  }

  test("CD reports the Markov boundary of T") {
    val res = CD.covariates(stats, "T", "Y", cfg)
    assert(res.markovBoundary == Set("Z", "W", "Y"))
  }

  test("CD counts its independence tests") {
    val res = CD.covariates(stats, "T", "Y", cfg)
    assert(res.testsPerformed > 0)
  }

  test("CD falls back to MB − {Y} for a parentless treatment") {
    // T is a root: T → A, T → B, B → Y
    val d2 = Dag(Vector("T", "A", "B", "Y"), Seq("T" -> "A", "T" -> "B", "B" -> "Y"))
    val net = BayesNet(d2, d2.nodes.map(_ -> 2).toMap, Map(
      "T" -> Map(Vector.empty[Int] -> Array(0.5, 0.5)),
      "A" -> Map(Vector(0) -> Array(0.85, 0.15), Vector(1) -> Array(0.2, 0.8)),
      "B" -> Map(Vector(0) -> Array(0.75, 0.25), Vector(1) -> Array(0.25, 0.75)),
      "Y" -> Map(Vector(0) -> Array(0.8, 0.2), Vector(1) -> Array(0.3, 0.7))))
    val s2 = MaterializedStats(net.sample(spark, 30000, seed = 32), d2.nodes)
    val res = CD.covariates(s2, "T", "Y", cfg)
    assert(res.usedFallback)
    assert(res.covariates == Set("A", "B"), s"got ${res.covariates}") // MB(T) − {Y}
  }

  test("fdAttributes flags a bijective (two-way FD) attribute") {
    val df = Datasets2.withFd(spark)
    val s  = MaterializedStats(df, Seq("T", "TCopy", "Other"))
    val fds = CD.fdAttributes(s, "T", eps = 0.05)
    assert(fds == Set("TCopy"))
  }

  test("phase II removes non-adjacent collider spouses") {
    // Fig. 2: Z → T ← W, T → C ← D. D satisfies (a) via collider T? No —
    // D satisfies (a) with W via collider C; phase II must drop D since
    // (T ⊥ D | ∅).
    val d3 = Dag(Vector("Z", "W", "T", "C", "D"),
      Seq("Z" -> "T", "W" -> "T", "T" -> "C", "D" -> "C"))
    val net = BayesNet(d3, d3.nodes.map(_ -> 2).toMap, Map(
      "Z" -> Map(Vector.empty[Int] -> Array(0.5, 0.5)),
      "W" -> Map(Vector.empty[Int] -> Array(0.5, 0.5)),
      "D" -> Map(Vector.empty[Int] -> Array(0.5, 0.5)),
      // parents sorted (W, Z)
      "T" -> Map(Vector(0, 0) -> Array(0.9, 0.1), Vector(0, 1) -> Array(0.3, 0.7),
                 Vector(1, 0) -> Array(0.65, 0.35), Vector(1, 1) -> Array(0.1, 0.9)),
      // parents sorted (D, T)
      "C" -> Map(Vector(0, 0) -> Array(0.9, 0.1), Vector(0, 1) -> Array(0.35, 0.65),
                 Vector(1, 0) -> Array(0.6, 0.4), Vector(1, 1) -> Array(0.08, 0.92))))
    val s3 = MaterializedStats(net.sample(spark, 50000, seed = 33), d3.nodes)
    val res = CD.covariates(s3, "T", "C", cfg)
    assert(!res.covariates.contains("D"), s"D must be pruned, got ${res.covariates}")
    assert(res.covariates == Set("Z", "W"), s"got ${res.covariates}")
  }

  test("highEntropyAttributes flags an ID-like column but not a category") {
    import spark.implicits._
    val df = spark.range(20000)
      .select((col("id") % 4).cast("string").as("cat"),
              col("id").cast("string").as("rowid"))
    val he = CD.highEntropyAttributes(df, Seq("cat", "rowid"))
    assert(he.contains("rowid"))
    assert(!he.contains("cat"))
  }

  test("subsets enumerates by increasing size with a cap") {
    val ss = CD.subsets(Seq("a", "b", "c"), 2).toSeq
    assert(ss.head == Seq.empty)
    assert(ss.contains(Seq("a", "b")) && !ss.contains(Seq("a", "b", "c")))
    assert(ss.size == 1 + 3 + 3)
  }
}

/** Tiny fixtures that need a SparkSession. */
object Datasets2 {
  def withFd(spark: org.apache.spark.sql.SparkSession) = {
    import spark.implicits._
    val rng = new scala.util.Random(5)
    (1 to 5000).map { _ =>
      val t = rng.nextInt(3)
      (t.toString, s"code-$t", rng.nextInt(2).toString)
    }.toDF("T", "TCopy", "Other")
  }
}
