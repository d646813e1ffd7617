package repro.bench

import repro.SparkSpec
import repro.experiments.{FalseDiscovery, Optimizations, Quality}

/** Fig. 5a (Q1): false discoveries of 1000 random SQL queries. */
class Fig5aFalseDiscoveryBench extends SparkSpec {
  test("Fig. 5a: rewriting changes the verdict of many random queries") {
    val res = FalseDiscovery.run(spark, nQueries = 1000, rows = 200000)
    println("=== Fig. 5a (measured, 1000 random queries over 200k rows) ===")
    println(FalseDiscovery.format(res))
    println("PAPER: >10% became insignificant after rewriting; 20% reversed trend\n")
    assert(res.nSignificant > 100, s"need power: ${res.nSignificant} significant queries")
    assert(res.fracInsignificant + res.fracReversed > 0.10,
      s"rewriting must matter: insig=${res.fracInsignificant} rev=${res.fracReversed}")
    assert(res.fracReversed > 0.05,
      s"a nontrivial share must reverse (Simpson), got ${res.fracReversed}")
  }
}

/** Fig. 5b–d + Fig. 6a (Q3): CD vs the CDD baselines on RandomData. */
class Fig5QualityBench extends SparkSpec {
  test("Fig. 5b-d / 6a: CD outperforms the baselines on parent recovery") {
    val rows = Quality.run(spark)
    println("=== Fig. 5b/c + 6a (measured) ===")
    println(Quality.summary(rows))
    println("=== Fig. 5d: F1 (≥2-parent nodes) by sample size ===")
    println(Quality.bySampleSize(rows))
    println("""PAPER: CD significantly outperforms most baselines on all nodes (5b) and
              |       beats ALL baselines on ≥2-parent nodes (5c), especially on sparse
              |       data (5d); CD conducts fewer independence tests per node than FGS (6a)
              |NOTE:  our exact-score hill climbers are stronger than the paper's bnlearn
              |       baselines at 8-16 nodes; CD's win over its own class (constraint-
              |       based FGS/IAMB) and on sparse data is what reproduces (EXPERIMENTS.md)
              |""".stripMargin)

    def meanBy(m: String, f: Quality.Row => Double, pred: Quality.Row => Boolean = _ => true) = {
      val v = rows.filter(r => r.method == m && pred(r) && !f(r).isNaN).map(f)
      v.sum / v.size
    }
    // Fig. 5c (constraint-based class): CD beats FGS and IAMB on ≥2-parent nodes
    val cdMulti = math.max(meanBy("CD+chi2", _.f1Multi), meanBy("CD+hymit", _.f1Multi))
    for (b <- Seq("FGS", "IAMB"))
      assert(cdMulti >= meanBy(b, _.f1Multi) - 0.02,
        s"CD ($cdMulti) must match/beat $b (${meanBy(b, _.f1Multi)}) on ≥2-parent nodes")
    // Fig. 5d: on the sparsest data, permutation-based CD degrades least
    val minRows = rows.map(_.rows).min
    val sparse: Quality.Row => Boolean = _.rows == minRows
    for (b <- Seq("FGS", "IAMB"))
      assert(meanBy("CD+hymit", _.f1Multi, sparse) > meanBy(b, _.f1Multi, sparse),
        s"CD+hymit must beat $b on the sparsest samples (Fig. 5d)")
    // Fig. 6a: learning the parents of ONE treatment needs far fewer tests
    // with CD than learning the full DAG with FGS
    val f6a = Quality.fig6aTestCounts(spark)
    println("=== Fig. 6a: tests to learn parents of a single treatment ===")
    println(Quality.formatFig6a(f6a))
    for (r <- f6a)
      assert(r.cdTests < r.fgsTests,
        s"CD (${r.cdTests}) must need fewer tests than full-DAG FGS (${r.fgsTests})")
  }
}

/** Fig. 6b + 8a (Q4): independence-test optimizations. */
class Fig6bTestOptBench extends SparkSpec {
  test("Fig. 6b/8a: MIT-sampled and HyMIT are much faster than MIT, similar accuracy") {
    val rows = Optimizations.testOptimizations(spark)
    println("=== Fig. 6b/8a (measured) ===")
    println(Optimizations.formatTestOpt(rows))
    println("""PAPER: MIT with sampling and HyMIT much faster than MIT; all proposed
              |       tests have comparable accuracy; data shuffling would take hours
              |       where MIT takes < 1s (not run here for that reason)
              |""".stripMargin)
    val m = rows.map(r => r.method -> r).toMap
    assert(m("MIT-sampled").avgMs <= m("MIT").avgMs, "sampling must not slow MIT down")
    assert(m("HyMIT").avgMs < m("MIT").avgMs, "HyMIT must be faster than MIT")
    for (r <- rows) assert(r.accuracy >= m("MIT").accuracy - 0.15,
      s"${r.method} accuracy ${r.accuracy} too far below MIT ${m("MIT").accuracy}")
  }
}

/** Fig. 6c (Q4): entropy caching and contingency materialization. */
class Fig6cCachingBench extends SparkSpec {
  test("Fig. 6c: materialization and caching dominate per-query aggregation") {
    val rows = Optimizations.cachingAndMaterialization(spark)
    println("=== Fig. 6c (measured; CD workload over 6 attrs, 20k rows) ===")
    println(Optimizations.formatCaching(rows))
    println("""PAPER: both optimizations effective; entropy computation is the major
              |       cost of the CD algorithm; materialization pays off more as data grows
              |""".stripMargin)
    val m = rows.map(r => r.variant -> r).toMap
    assert(m("materialized+cache").seconds < m("spark,no cache").seconds,
      "one materialized table must beat per-entropy aggregation")
    assert(m("spark+cache").seconds < m("spark,no cache").seconds,
      "entropy caching must beat no caching")
    assert(m("spark+cache").entropyEvals < m("spark,no cache").entropyEvals)
  }
}

/** Fig. 6d + 8b (Q4): pre-computed OLAP data cubes. */
class Fig6dCubeBench extends SparkSpec {
  test("Fig. 6d/8b: a pre-computed cube answers the CD workload near-instantly") {
    val rows = Optimizations.dataCubes(spark)
    println("=== Fig. 6d/8b (measured; CD workload, 8 binary attrs) ===")
    println(Optimizations.formatCubes(rows))
    println("PAPER: the advantage of using the data cube is dramatic and grows with data size\n")
    for (r <- rows)
      assert(r.cubeQueryS < r.directS,
        s"cube query time ${r.cubeQueryS}s must beat direct ${r.directS}s at ${r.rows} rows")
    // the advantage grows with data size
    val speedups = rows.map(r => r.directS / math.max(1e-9, r.cubeQueryS))
    assert(speedups.last > speedups.head * 0.8,
      s"speedup should not shrink materially with size: $speedups")
  }
}
