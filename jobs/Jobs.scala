package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.experiments._

/** spark-submit entrypoints, one per paper table/figure (DESIGN.md § 4).
  *
  * Example:
  *   spark-submit --class repro.jobs.Table1Runtime target/scala-2.13/repro_2.13-0.1.0-SNAPSHOT.jar
  */
object JobUtil {
  def session(name: String): SparkSession = {
    val s = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(name)
      .config("spark.sql.shuffle.partitions", "64")
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .config("spark.ui.enabled", "false")
      .getOrCreate()
    s.sparkContext.setLogLevel("WARN")
    s
  }
}

/** Table 1: runtime of detection/explanation/resolution per dataset. */
object Table1Runtime {
  def main(args: Array[String]): Unit = {
    val spark = JobUtil.session("table1")
    val names = Seq("AdultData", "StaplesData", "BerkeleyData", "CancerData", "FlightData")
    val runs  = names.map(EndToEnd.run(spark, _))
    println("=== Table 1: runtime (s) for detection, explanation, resolution ===")
    println(EndToEnd.formatTable1(runs))
    spark.stop()
  }
}

/** Fig. 1: the FlightData running example (Ex. 1.1). */
object Fig1Flight {
  def main(args: Array[String]): Unit = {
    val spark = JobUtil.session("fig1")
    val run = EndToEnd.run(spark, "FlightData")
    println("=== Fig. 1: carriers, delays and Simpson's paradox ===")
    println(EndToEnd.formatReport(run.report))
    spark.stop()
  }
}

/** Fig. 3 (top): effect of gender on income, AdultData. */
object Fig3Adult {
  def main(args: Array[String]): Unit = {
    val spark = JobUtil.session("fig3-adult")
    val run = EndToEnd.run(spark, "AdultData")
    println("=== Fig. 3 (top): gender -> income, AdultData ===")
    println(EndToEnd.formatReport(run.report))
    spark.stop()
  }
}

/** Fig. 3 (bottom): effect of income on price, StaplesData. */
object Fig3Staples {
  def main(args: Array[String]): Unit = {
    val spark = JobUtil.session("fig3-staples")
    val run = EndToEnd.run(spark, "StaplesData")
    println("=== Fig. 3 (bottom): income -> price, StaplesData ===")
    println(EndToEnd.formatReport(run.report))
    spark.stop()
  }
}

/** Fig. 4 (top): effect of gender on admission, BerkeleyData. */
object Fig4Berkeley {
  def main(args: Array[String]): Unit = {
    val spark = JobUtil.session("fig4-berkeley")
    val run = EndToEnd.run(spark, "BerkeleyData")
    println("=== Fig. 4 (top): gender -> admission, BerkeleyData ===")
    println(EndToEnd.formatReport(run.report))
    spark.stop()
  }
}

/** Fig. 4 (bottom): effect of lung cancer on car accidents, CancerData. */
object Fig4Cancer {
  def main(args: Array[String]): Unit = {
    val spark = JobUtil.session("fig4-cancer")
    val run = EndToEnd.run(spark, "CancerData", rows = 2000)
    println("=== Fig. 4 (bottom): lung cancer -> car accident, CancerData ===")
    println(EndToEnd.formatReport(run.report))
    spark.stop()
  }
}

/** Fig. 5a (Q1): false discoveries of random SQL queries. */
object Fig5aFalseDiscovery {
  def main(args: Array[String]): Unit = {
    val spark = JobUtil.session("fig5a")
    val n = if (args.nonEmpty) args(0).toInt else 1000
    val res = FalseDiscovery.run(spark, nQueries = n)
    println(s"=== Fig. 5a: $n random queries, rewritten w.r.t. Airport/Month/DayOfWeek/Year ===")
    println(FalseDiscovery.format(res))
    spark.stop()
  }
}

/** Fig. 5b–d + Fig. 6a (Q3): CD vs CDD baselines on RandomData. */
object Fig5Quality {
  def main(args: Array[String]): Unit = {
    val spark = JobUtil.session("fig5-quality")
    val rows = Quality.run(spark)
    println("=== Fig. 5b/c + 6a: F1 of parent recovery and tests/node ===")
    println(Quality.summary(rows))
    println("=== Fig. 5d: F1 (nodes with ≥2 parents) by sample size ===")
    println(Quality.bySampleSize(rows))
    println("=== Fig. 6a: tests to learn parents of a single treatment ===")
    println(Quality.formatFig6a(Quality.fig6aTestCounts(spark)))
    spark.stop()
  }
}

/** Fig. 6b–d (Q4): optimization efficacy. */
object Fig6Optimizations {
  def main(args: Array[String]): Unit = {
    val spark = JobUtil.session("fig6")
    println("=== Fig. 6b/8a: independence-test runtime and accuracy ===")
    println(Optimizations.formatTestOpt(Optimizations.testOptimizations(spark)))
    println("=== Fig. 6c: caching and materialization ===")
    println(Optimizations.formatCaching(Optimizations.cachingAndMaterialization(spark)))
    println("=== Fig. 6d/8b: pre-computed data cubes ===")
    println(Optimizations.formatCubes(Optimizations.dataCubes(spark)))
    spark.stop()
  }
}
