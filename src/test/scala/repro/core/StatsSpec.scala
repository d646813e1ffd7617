package repro.core

import org.apache.spark.sql.functions._
import repro.SparkSpec

class StatsSpec extends SparkSpec {
  import spark.implicits._

  private lazy val df = {
    val rng = new scala.util.Random(9)
    (1 to 4000).map { _ =>
      val a = rng.nextInt(3); val b = if (rng.nextDouble() < 0.7) a % 2 else rng.nextInt(2)
      (a.toString, b.toString, rng.nextInt(4).toString)
    }.toDF("A", "B", "C")
  }

  test("SparkStats and MaterializedStats agree on entropies") {
    val s1 = new SparkStats(df, Seq("A", "B", "C"))
    val s2 = MaterializedStats(df, Seq("A", "B", "C"))
    for (attrs <- Seq(Seq("A"), Seq("B"), Seq("A", "B"), Seq("A", "B", "C")))
      assert(math.abs(s1.entropy(attrs) - s2.entropy(attrs)) < 1e-12, s"$attrs")
  }

  test("SparkStats and MaterializedStats agree on CMI") {
    val s1 = new SparkStats(df, Seq("A", "B", "C"))
    val s2 = MaterializedStats(df, Seq("A", "B", "C"))
    assert(math.abs(s1.cmi(Seq("A"), Seq("B"), Seq("C")) -
                    s2.cmi(Seq("A"), Seq("B"), Seq("C"))) < 1e-12)
  }

  test("CubeStats agrees with MaterializedStats on every subset") {
    val s2 = MaterializedStats(df, Seq("A", "B", "C"))
    val s3 = CubeStats(df, Seq("A", "B", "C"))
    for (attrs <- Seq(Seq("A"), Seq("C"), Seq("A", "C"), Seq("B", "A"), Seq("A", "B", "C"))) {
      assert(math.abs(s2.entropy(attrs) - s3.entropy(attrs)) < 1e-12, s"entropy $attrs")
      assert(s2.contingency(attrs).counts == s3.contingency(attrs).counts, s"ct $attrs")
    }
  }

  test("CubeStats n matches the row count") {
    assert(CubeStats(df, Seq("A", "B")).n == 4000L)
  }

  test("entropy caching avoids recomputation") {
    val s = new SparkStats(df, Seq("A", "B", "C"), cacheEnabled = true)
    s.entropy(Seq("A", "B")); val evals1 = s.entropyEvaluations
    s.entropy(Seq("B", "A")) // same set, different order
    assert(s.entropyEvaluations == evals1)
  }

  test("uncached SparkStats recomputes") {
    val s = new SparkStats(df, Seq("A", "B", "C"), cacheEnabled = false)
    s.entropy(Seq("A")); s.entropy(Seq("A"))
    assert(s.entropyEvaluations == 2)
  }

  test("MaterializedStats caches entropies") {
    val s = MaterializedStats(df, Seq("A", "B", "C"))
    s.entropy(Seq("A", "C")); val e1 = s.entropyEvaluations
    s.entropy(Seq("C", "A"))
    assert(s.entropyEvaluations == e1)
  }

  test("distinctCount matches spark countDistinct") {
    val s = MaterializedStats(df, Seq("A", "B", "C"))
    val expected = df.select(countDistinct(col("A"), col("B"))).as[Long].head()
    assert(s.distinctCount(Seq("A", "B")) == expected)
  }

  test("CubeStats rejects subsets not in the cube") {
    val s = CubeStats(df, Seq("A", "B"))
    intercept[IllegalArgumentException] { s.contingency(Seq("C")) }
  }

  test("null values survive the cube as the sentinel category") {
    val dfN = Seq(("x", Some("u")), ("x", None), ("y", Some("u"))).toDF("P", "Q")
    val s = CubeStats(dfN, Seq("P", "Q"))
    assert(s.contingency(Seq("Q")).counts(Vector("∅")) == 1L)
    assert(s.n == 3)
  }
}
