package repro.experiments

import org.apache.spark.sql.SparkSession
import repro.baselines.{ScoreSearch, StructureLearning}
import repro.causal.{BayesNet, Dag, RandomDag}
import repro.core._
import repro.core.IndepTest.Tester

/** Q3 (§ 7.4, Fig. 5b–d) and Fig. 6a: quality of the CD algorithm vs the
  * CDD baselines on RandomData (random DAGs with known ground truth),
  * measured as F1 of recovered parent sets; plus the number of
  * independence tests per node (CD vs FGS).
  */
object Quality {

  final case class Config(
      nodeCounts: Seq[Int] = Seq(8, 16),
      cardinalities: Seq[Int] = Seq(2, 5),
      sampleSizes: Seq[Long] = Seq(500, 2000, 20000),
      seeds: Seq[Long] = Seq(1, 2),
      expectedParents: Double = 1.2,
      maxCond: Int = 2)

  final case class Row(
      nodes: Int, card: Int, rows: Long, seed: Long,
      method: String,
      f1All: Double,          // over all nodes (Fig. 5b)
      f1Multi: Double,        // over nodes with ≥ 2 parents (Fig. 5c)
      testsPerNode: Double)   // Fig. 6a (0 for score-based)

  def f1(pred: Set[String], truth: Set[String]): Double = {
    if (pred.isEmpty && truth.isEmpty) return 1.0
    val tp = (pred & truth).size.toDouble
    if (tp == 0) return 0.0
    val p = tp / pred.size; val r = tp / truth.size
    2 * p * r / (p + r)
  }

  private def mean(xs: Seq[Double]): Double = if (xs.isEmpty) Double.NaN else xs.sum / xs.size

  private def score(dag: Dag, parentsOf: String => Set[String]): (Double, Double) = {
    val all   = dag.nodes.map(n => f1(parentsOf(n), dag.parents(n)))
    val multi = dag.nodes.filter(n => dag.parents(n).size >= 2)
      .map(n => f1(parentsOf(n), dag.parents(n)))
    (mean(all), mean(multi))
  }

  def run(spark: SparkSession, cfg: Config = Config()): Seq[Row] = {
    val out = Seq.newBuilder[Row]
    for {
      n    <- cfg.nodeCounts
      card <- cfg.cardinalities
      rows <- cfg.sampleSizes
      seed <- cfg.seeds
    } {
      val dag = RandomDag.generate(n, cfg.expectedParents, seed)
      val net = BayesNet.random(dag, card, seed)
      val df  = net.sample(spark, rows, seed).cache()
      val stats = MaterializedStats(df, dag.nodes)
      df.unpersist()

      def cdAll(method: String): Row = {
        val counter = new IndepTest.Counter
        val tester  = Tester(method = method, alpha = 0.01, m = 60,
                             minEffect = 1e-3, counter = counter)
        // one shared boundary cache across the node sweep — matches how
        // FGS amortizes its all-node MB computation
        val cache = scala.collection.mutable.Map.empty[String, Set[String]]
        val parents = dag.nodes.map { t =>
          t -> CD.covariates(stats, t, t,
            CD.Config(tester = tester, maxCondSet = cfg.maxCond,
                      fallbackToMb = false, mbCache = Some(cache))).covariates
        }.toMap
        val (a, m2) = score(dag, parents)
        Row(n, card, rows, seed, s"CD+$method", a, m2,
            counter.tests.toDouble / dag.nodes.size)
      }

      def constraint(name: String,
                     learn: (StatsProvider, Tester, Int) => StructureLearning.Learned): Row = {
        val counter = new IndepTest.Counter
        val tester  = Tester(method = "chi2", alpha = 0.01, minEffect = 1e-3,
                             counter = counter)
        val l = learn(stats, tester, cfg.maxCond)
        val (a, m2) = score(dag, x => l.parents(x))
        Row(n, card, rows, seed, name, a, m2, counter.tests.toDouble / dag.nodes.size)
      }

      def scored(name: String, s: ScoreSearch.Score): Row = {
        val r = ScoreSearch.hillClimb(stats, s, maxParents = 3)
        val (a, m2) = score(dag, x => r.parents(x))
        Row(n, card, rows, seed, name, a, m2, 0.0)
      }

      out += cdAll("chi2")
      out += cdAll("hymit")
      out += constraint("FGS", StructureLearning.fgs)
      out += constraint("IAMB", StructureLearning.iamb)
      out += scored("HC-AIC", ScoreSearch.AIC)
      out += scored("HC-BIC", ScoreSearch.BIC)
      out += scored("HC-BDe", ScoreSearch.BDe)
    }
    out.result()
  }

  final case class Fig6aRow(nodes: Int, rows: Long, seed: Long,
                            cdTests: Long, fgsTests: Long)

  /** Fig. 6a proper: independence tests needed to learn the parents of a
    * SINGLE treatment. CD explores only the Markov boundaries around T;
    * FGS must learn the whole structure before it can orient T's edges.
    */
  def fig6aTestCounts(spark: SparkSession, cfg: Config = Config()): Seq[Fig6aRow] = {
    for {
      n    <- cfg.nodeCounts
      seed <- cfg.seeds
    } yield {
      val dag = RandomDag.generate(n, cfg.expectedParents, seed)
      val net = BayesNet.random(dag, 2, seed)
      val df  = net.sample(spark, 10000, seed).cache()
      val stats = MaterializedStats(df, dag.nodes)
      df.unpersist()
      // treatment: a node with ≥2 parents if one exists, else the busiest
      val t = dag.nodes.find(x => dag.parents(x).size >= 2)
        .getOrElse(dag.nodes.maxBy(x => dag.neighbors(x).size))
      val cdCounter = new IndepTest.Counter
      CD.covariates(stats, t, t,
        CD.Config(tester = Tester(method = "chi2", alpha = 0.01, minEffect = 1e-3,
                                  counter = cdCounter),
                  maxCondSet = cfg.maxCond, fallbackToMb = false))
      val fgsCounter = new IndepTest.Counter
      StructureLearning.fgs(stats,
        Tester(method = "chi2", alpha = 0.01, minEffect = 1e-3, counter = fgsCounter),
        cfg.maxCond)
      Fig6aRow(n, 10000, seed, cdCounter.tests, fgsCounter.tests)
    }
  }

  def formatFig6a(rows: Seq[Fig6aRow]): String = {
    val sb = new StringBuilder
    sb ++= f"${"nodes"}%6s ${"seed"}%5s ${"CD tests (one T)"}%17s ${"FGS tests (full DAG)"}%21s\n"
    rows.foreach(r => sb ++= f"${r.nodes}%6d ${r.seed}%5d ${r.cdTests}%17d ${r.fgsTests}%21d\n")
    sb.result()
  }

  /** Aggregate rows by method (and optionally a grouping key). */
  def summary(rows: Seq[Row]): String = {
    val sb = new StringBuilder
    sb ++= f"${"method"}%-10s ${"F1(all)"}%8s ${"F1(≥2 par.)"}%12s ${"tests/node"}%11s\n"
    for ((m, rs) <- rows.groupBy(_.method).toSeq.sortBy(_._1)) {
      sb ++= f"$m%-10s ${mean(rs.map(_.f1All))}%8.3f " +
             f"${mean(rs.filterNot(_.f1Multi.isNaN).map(_.f1Multi))}%12.3f " +
             f"${mean(rs.map(_.testsPerNode))}%11.1f\n"
    }
    sb.result()
  }

  /** Fig. 5d flavour: F1 (≥2 parents) by sample size per method. */
  def bySampleSize(rows: Seq[Row]): String = {
    val sb = new StringBuilder
    val sizes = rows.map(_.rows).distinct.sorted
    sb ++= f"${"method"}%-10s" + sizes.map(s => f"${s}%10d").mkString + "\n"
    for ((m, rs) <- rows.groupBy(_.method).toSeq.sortBy(_._1)) {
      sb ++= f"$m%-10s" + sizes.map { s =>
        val v = rs.filter(r => r.rows == s && !r.f1Multi.isNaN).map(_.f1Multi)
        f"${mean(v)}%10.3f"
      }.mkString + "\n"
    }
    sb.result()
  }
}
