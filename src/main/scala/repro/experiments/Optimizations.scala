package repro.experiments

import org.apache.spark.sql.SparkSession
import repro.baselines.StructureLearning
import repro.causal.{BayesNet, Dag, RandomDag}
import repro.core._
import repro.core.IndepTest.Tester
import scala.util.Random

/** Q4 (§ 7.5): efficacy of the optimization techniques —
  *
  *  - Fig. 6b / 8a: runtime + accuracy of MIT vs MIT-with-sampling vs
  *    HyMIT vs χ² on sparse (< 50k row) data;
  *  - Fig. 6c: entropy caching and contingency-table materialization;
  *  - Fig. 6d / 8b: pre-computed OLAP data cubes.
  */
object Optimizations {

  // ------------------------------------------------- Fig. 6b / Fig. 8a --

  final case class TestOptRow(method: String, avgMs: Double, accuracy: Double)

  /** Benchmark the four independence tests on (X ⊥ Y | Z) instances with
    * known d-separation ground truth drawn from random DAGs.
    */
  def testOptimizations(spark: SparkSession, sizes: Seq[Long] = Seq(1000, 5000, 20000),
                        nCases: Int = 6, m: Int = 100): Seq[TestOptRow] = {
    val rng = new Random(3)
    // build labelled test cases: (stats, x, y, z, trulyIndependent)
    val cases = for {
      rows <- sizes
      i    <- 1 to nCases
    } yield {
      val seed = rows * 100 + i
      val dag  = RandomDag.generate(6, 1.3, seed)
      val net  = BayesNet.random(dag, 3, seed)
      val df   = net.sample(spark, rows, seed)
      val stats = MaterializedStats(df, dag.nodes)
      val nodes = rng.shuffle(dag.nodes.toList)
      val x = nodes.head; val y = nodes(1)
      val z = nodes.drop(2).take(rng.nextInt(3)).sorted
      (stats, x, y, z, dag.dSeparated(x, y, z.toSet))
    }

    val methods = Seq[(String, (StatsProvider, String, String, Seq[String]) => TestResult)](
      "chi2"        -> ((s, x, y, z) => IndepTest.chi2(s, x, y, z)),
      "MIT"         -> ((s, x, y, z) => IndepTest.mit(s, x, y, z, m, new Random(7))),
      "MIT-sampled" -> ((s, x, y, z) => IndepTest.mit(s, x, y, z, m, new Random(7),
                                                      groupFraction = 0.3)),
      "HyMIT"       -> ((s, x, y, z) => IndepTest.hymit(s, x, y, z, 5.0, m, new Random(7),
                                                        groupFraction = 0.3)))

    methods.map { case (name, f) =>
      var correct = 0
      val t0 = System.nanoTime()
      for ((s, x, y, z, indep) <- cases) {
        val verdict = f(s, x, y, z).independent(0.01)
        if (verdict == indep) correct += 1
      }
      val ms = (System.nanoTime() - t0) / 1e6 / cases.size
      TestOptRow(name, ms, correct.toDouble / cases.size)
    }
  }

  def formatTestOpt(rows: Seq[TestOptRow]): String = {
    val sb = new StringBuilder
    sb ++= f"${"test"}%-12s ${"avg ms"}%10s ${"accuracy"}%9s\n"
    rows.foreach(r => sb ++= f"${r.method}%-12s ${r.avgMs}%10.2f ${r.accuracy}%9.3f\n")
    sb.result()
  }

  // ------------------------------------------------------------ Fig. 6c --

  final case class CachingRow(variant: String, seconds: Double, entropyEvals: Long)

  /** Run the CD workload (parents of every node) under the three stats
    * execution strategies of § 6.
    */
  def cachingAndMaterialization(spark: SparkSession, rows: Long = 20000,
                                nodes: Int = 6, seed: Long = 5): Seq[CachingRow] = {
    val dag = RandomDag.generate(nodes, 1.3, seed)
    val net = BayesNet.random(dag, 2, seed)
    val df  = net.sample(spark, rows, seed).cache()
    df.count()

    def workload(stats: StatsProvider): Long = {
      val tester = Tester(method = "chi2", alpha = 0.01, minEffect = 1e-3)
      for (t <- dag.nodes)
        CD.covariates(stats, t, t, CD.Config(tester = tester, maxCondSet = 2,
                                             fallbackToMb = false))
      stats.entropyEvaluations
    }

    def run(name: String, mk: => StatsProvider): CachingRow = {
      val t0 = System.nanoTime()
      val s  = mk
      val evals = workload(s)
      CachingRow(name, (System.nanoTime() - t0) / 1e9, evals)
    }

    val out = Seq(
      run("materialized+cache", MaterializedStats(df, dag.nodes)),
      run("spark+cache",        new SparkStats(df, dag.nodes, cacheEnabled = true)),
      run("spark,no cache",     new SparkStats(df, dag.nodes, cacheEnabled = false)))
    df.unpersist()
    out
  }

  def formatCaching(rows: Seq[CachingRow]): String = {
    val sb = new StringBuilder
    sb ++= f"${"variant"}%-20s ${"seconds"}%9s ${"entropy evals"}%14s\n"
    rows.foreach(r => sb ++= f"${r.variant}%-20s ${r.seconds}%9.2f ${r.entropyEvals}%14d\n")
    sb.result()
  }

  // ------------------------------------------------------------ Fig. 6d --

  final case class CubeRow(rows: Long, attrs: Int, cubeBuildS: Double,
                           cubeQueryS: Double, directS: Double)

  /** CD workload answered from a pre-computed data cube vs aggregating
    * the raw data per contingency table (Fig. 6d varies data size,
    * Fig. 8b varies the attribute count).
    */
  def dataCubes(spark: SparkSession, sizes: Seq[Long] = Seq(10000, 100000, 400000),
                attrCounts: Seq[Int] = Seq(8), seed: Long = 6): Seq[CubeRow] = {
    for (rows <- sizes; nAttr <- attrCounts) yield {
      val dag = RandomDag.generate(nAttr, 1.3, seed)
      val net = BayesNet.random(dag, 2, seed)
      val df  = net.sample(spark, rows, seed).cache()
      df.count()

      def workload(stats: StatsProvider): Unit = {
        val tester = Tester(method = "chi2", alpha = 0.01, minEffect = 1e-3)
        for (t <- dag.nodes.take(4))
          CD.covariates(stats, t, t, CD.Config(tester = tester, maxCondSet = 2,
                                               fallbackToMb = false))
      }

      val t0 = System.nanoTime()
      val cube = CubeStats(df, dag.nodes)
      val tBuild = (System.nanoTime() - t0) / 1e9
      val t1 = System.nanoTime()
      workload(cube)
      val tCube = (System.nanoTime() - t1) / 1e9
      val t2 = System.nanoTime()
      workload(new SparkStats(df, dag.nodes, cacheEnabled = true))
      val tDirect = (System.nanoTime() - t2) / 1e9
      df.unpersist()
      CubeRow(rows, nAttr, tBuild, tCube, tDirect)
    }
  }

  def formatCubes(rows: Seq[CubeRow]): String = {
    val sb = new StringBuilder
    sb ++= f"${"rows"}%9s ${"attrs"}%6s ${"cube build s"}%13s ${"cube query s"}%13s ${"direct s"}%9s ${"speedup"}%8s\n"
    rows.foreach { r =>
      sb ++= f"${r.rows}%9d ${r.attrs}%6d ${r.cubeBuildS}%13.2f ${r.cubeQueryS}%13.2f " +
             f"${r.directS}%9.2f ${r.directS / math.max(1e-9, r.cubeQueryS)}%8.1fx\n"
    }
    sb.result()
  }
}
