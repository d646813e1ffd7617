package repro.experiments

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.core._
import repro.core.IndepTest.Tester
import repro.data.Datasets

/** End-to-end HypDB runs over the five evaluation datasets (paper § 7.3,
  * Table 1 and the table-shaped Figures 1, 3, 4). Shared by `jobs/` mains
  * and `bench/` suites.
  */
object EndToEnd {

  /** The tester configuration of § 7.3: HyMIT, α = 0.01, 100 permutation
    * samples, group sampling ∝ log|Π_Z|. `minEffect` guards the many
    * near-null tests (§ 8 "Statistical Errors").
    */
  def defaultConfig: HypDB.Config = HypDB.Config(
    tester = Tester(method = "hymit", alpha = 0.01, m = 100, minEffect = 1e-3),
    cd = CD.Config(tester = Tester(method = "hymit", alpha = 0.01, m = 100,
                                   minEffect = 1e-3)),
    permutations = 100)

  final case class DatasetRun(
      name: String,
      columns: Int,
      rows: Long,
      report: HypDB.Report)

  /** Load a dataset + its analysis roles by name. */
  def dataset(spark: SparkSession, name: String, rows: Long = 0)
      : (DataFrame, String, String, Seq[String], String) = name match {
    case "FlightData" =>
      val df = Datasets.flight(spark, if (rows > 0) rows else 44000)
        .select("Carrier", "Delayed", "Airport", "Year", "DepTime", "Month",
                "DayOfWeek", "AirportWAC", "FlightNum")
      (df, "Carrier", "Delayed", Datasets.flightAttrs, "UA")
    case "AdultData" =>
      (Datasets.adult(spark, if (rows > 0) rows else 48842),
       "Gender", "Income", Datasets.adultAttrs, "Female")
    case "StaplesData" =>
      (Datasets.staples(spark, if (rows > 0) rows else 988871),
       "Income", "Price", Datasets.staplesAttrs, "low")
    case "BerkeleyData" =>
      (Datasets.berkeley(spark), "Gender", "Accepted", Datasets.berkeleyAttrs, "Female")
    case "CancerData" =>
      (Datasets.cancer(spark, if (rows > 0) rows else 2000),
       "Lung_Cancer", "Car_Accident", Datasets.cancerAttrs, "0")
    case other => throw new IllegalArgumentException(s"unknown dataset $other")
  }

  def run(spark: SparkSession, name: String, rows: Long = 0,
          cfg: HypDB.Config = defaultConfig): DatasetRun = {
    val (df, t, y, attrs, baseline) = dataset(spark, name, rows)
    val cached = df.cache()
    val n      = cached.count()
    val report = HypDB.analyze(cached, t, y, attrs, baseline, cfg)
    cached.unpersist()
    DatasetRun(name, df.columns.length, n, report)
  }

  // ------------------------------------------------------- formatting --

  def fmt(d: Double): String = if (d.isNaN) "n/a" else f"$d%.3f"

  /** The per-dataset block the paper prints in Figs 1/3/4. */
  def formatReport(r: HypDB.Report): String = {
    val sb = new StringBuilder
    val levels = r.originalAnswers.keys.toSeq.sorted
    sb ++= s"treatment=${r.treatment} outcome=${r.outcome}\n"
    sb ++= s"covariates Z = ${r.covariates.mkString(", ")}" +
           (if (r.usedFallback) "  (fallback Z = MB(T) − {Y})" else "") + "\n"
    sb ++= s"mediators  M = ${r.mediators.mkString(", ")}\n"
    sb ++= s"dropped (FD / key-like) = ${r.dropped.toSeq.sorted.mkString(", ")}\n"
    sb ++= f"bias: total p=${r.biasTotal.pValue}%.4f  direct p=${r.biasDirect.pValue}%.4f\n"
    sb ++= f"${r.treatment}%-14s | SQL Q. | Total  | Direct\n"
    for (l <- levels) {
      val tot = r.totalEffect.map(_.answers.getOrElse(l, Double.NaN)).getOrElse(Double.NaN)
      val dir = r.directEffect.map(_.answers.getOrElse(l, Double.NaN)).getOrElse(Double.NaN)
      sb ++= f"$l%-14s | ${fmt(r.originalAnswers(l))}%-6s | ${fmt(tot)}%-6s | ${fmt(dir)}%-6s\n"
    }
    if (levels.size == 2) {
      val (a, b) = (levels(1), levels(0))
      def diff(m: Map[String, Double]) = m.getOrElse(a, Double.NaN) - m.getOrElse(b, Double.NaN)
      sb ++= f"diff ($a−$b)  | ${fmt(diff(r.originalAnswers))}%-6s | " +
             f"${fmt(r.totalEffect.map(e => diff(e.answers)).getOrElse(Double.NaN))}%-6s | " +
             f"${fmt(r.directEffect.map(e => diff(e.answers)).getOrElse(Double.NaN))}%-6s\n"
      sb ++= f"p-value        | ${fmt(r.originalSignificance.pValue)}%-6s | " +
             f"${fmt(r.totalEffect.map(_.significance.pValue).getOrElse(Double.NaN))}%-6s | " +
             f"${fmt(r.directEffect.map(_.significance.pValue).getOrElse(Double.NaN))}%-6s\n"
    }
    sb ++= "coarse-grained explanation (responsibility):\n"
    for (x <- r.responsibilities)
      sb ++= f"  ${x.attribute}%-20s rho=${x.rho}%.2f\n"
    sb ++= "fine-grained explanation (top triples by Borda rank):\n"
    for ((attr, ts) <- r.fineGrained.toSeq.sortBy(_._1); tr <- ts)
      sb ++= s"  [$attr] ${r.treatment}=${tr.t}, ${r.outcome}=${tr.y}, $attr=${tr.z}" +
             f"  (kTZ=${tr.kappaTZ}%+.4f kYZ=${tr.kappaYZ}%+.4f)\n"
    sb.result()
  }

  /** Table 1: runtime (s) of Det./Exp./Res. per dataset. */
  def formatTable1(runs: Seq[DatasetRun]): String = {
    val sb = new StringBuilder
    sb ++= f"${"Dataset"}%-14s ${"Cols"}%5s ${"Rows"}%8s ${"Det."}%8s ${"Exp."}%8s ${"Res."}%8s\n"
    for (r <- runs) {
      val t = r.report.timings
      sb ++= f"${r.name}%-14s ${r.columns}%5d ${r.rows}%8d " +
             f"${t.getOrElse("detection", 0.0)}%8.2f ${t.getOrElse("explanation", 0.0)}%8.2f " +
             f"${t.getOrElse("resolution", 0.0)}%8.2f\n"
    }
    sb.result()
  }
}
