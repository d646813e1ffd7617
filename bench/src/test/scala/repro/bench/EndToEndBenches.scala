package repro.bench

import repro.SparkSpec
import repro.experiments.EndToEnd

/** Table 1 + the table-shaped Figures 1, 3 and 4 (§ 7.3). Each bench
  * prints the rows the paper reports (with the paper's numbers inline)
  * and asserts the qualitative shape. Full numeric diff: EXPERIMENTS.md.
  */
class Table1RuntimeBench extends SparkSpec {
  test("Table 1: detection/explanation/resolution runtime per dataset") {
    val names = Seq("AdultData", "StaplesData", "BerkeleyData", "CancerData", "FlightData")
    val runs  = names.map(EndToEnd.run(spark, _))
    println("=== Table 1 (measured) ===")
    println(EndToEnd.formatTable1(runs))
    println("""PAPER: AdultData 15c/48842r Det=65 Exp<1 Res<1; StaplesData 6c/988871r Det=5;
              |       BerkeleyData 3c/4428r Det=2; CancerData 12c/2000r Det<1; FlightData 101c/43853r Det=20
              |""".stripMargin)
    // shape: detection dominates; explanation and resolution are sub-second-ish
    for (r <- runs) {
      val t = r.report.timings
      assert(t("detection") >= t("explanation"), s"${r.name}: $t")
      assert(t("explanation") < 10 && t("resolution") < 60, s"${r.name}: $t")
    }
    // the two hardest datasets (most attributes/categories) cost the most detection time
    val det = runs.map(r => r.name -> r.report.timings("detection")).toMap
    assert(det("FlightData") > det("BerkeleyData"), s"$det")
  }
}

class Fig1FlightBench extends SparkSpec {
  test("Fig. 1: FlightData — Simpson's paradox detected, explained, resolved") {
    val run = EndToEnd.run(spark, "FlightData")
    val r   = run.report
    println("=== Fig. 1 (measured) ===")
    println(EndToEnd.formatReport(r))
    println("""PAPER: SQL favors AA; per-airport UA wins everywhere; query biased
              |       (I(Carrier;Airport)=0.25, p<0.001); top responsibility Airport, then Year;
              |       total effect: UA slightly better; direct effect: no significant difference
              |""".stripMargin)
    assert(r.biasedTotal(), "query must be detected as biased")
    assert(r.originalAnswers("AA") < r.originalAnswers("UA"), "SQL answer favors AA")
    val adj = r.totalEffect.get.answers
    assert(adj("AA") > adj("UA"), "adjusted answer reverses: UA is actually better")
    assert(r.responsibilities.head.attribute == "Airport", "Airport explains most bias")
    assert(Set("Airport", "Year").subsetOf(r.covariates.toSet))
    assert(r.dropped.contains("AirportWAC") && r.dropped.contains("FlightNum"),
      "FD and key-like attributes dropped")
  }
}

class Fig3AdultBench extends SparkSpec {
  test("Fig. 3 top: AdultData — gender disparity mostly explained by mediators") {
    val run = EndToEnd.run(spark, "AdultData")
    val r   = run.report
    println("=== Fig. 3 top (measured) ===")
    println(EndToEnd.formatReport(r))
    println("""PAPER: SQL 0.11 (F) vs 0.30 (M), diff 0.29 p<0.001; total effect diff <0.02;
              |       direct effect diff 0.01 insignificant; responsibility:
              |       MaritalStatus 0.58, Education 0.13, CapitalGain 0.07, Hours 0.04, Age 0.04
              |""".stripMargin)
    val sqlDiff = r.originalAnswers("Male") - r.originalAnswers("Female")
    assert(sqlDiff > 0.10, s"SQL gap $sqlDiff")
    assert(r.originalSignificance.pValue < 0.01)
    assert(r.biasedDirect(), "query biased w.r.t. mediators")
    val dir = r.directEffect.get.answers
    val dd  = dir("Male") - dir("Female")
    assert(math.abs(dd) < sqlDiff / 2, s"direct diff $dd must shrink vs SQL $sqlDiff")
    assert(r.responsibilities.head.attribute == "MaritalStatus",
      s"MaritalStatus should top the explanation, got ${r.responsibilities}")
  }
}

class Fig3StaplesBench extends SparkSpec {
  test("Fig. 3 bottom: StaplesData — income affects price only via distance") {
    val run = EndToEnd.run(spark, "StaplesData", rows = 400000)
    val r   = run.report
    println("=== Fig. 3 bottom (measured, 400k rows vs paper's 988,871) ===")
    println(EndToEnd.formatReport(r))
    println("""PAPER: SQL 0.06 (income 0) vs 0.05 (income 1), p<0.001; total ≈ same;
              |       direct effect diff 0, p=1 — the effect is entirely via Distance
              |""".stripMargin)
    assert(r.originalAnswers("low") > r.originalAnswers("high"), "low income pays more")
    assert(r.originalSignificance.pValue < 0.01, "SQL association significant")
    assert(r.mediators.contains("Distance"), s"mediators ${r.mediators}")
    val dir = r.directEffect.get.answers
    assert(math.abs(dir("low") - dir("high")) < 0.01,
      s"no direct income->price effect, got $dir")
  }
}

class Fig4BerkeleyBench extends SparkSpec {
  test("Fig. 4 top: BerkeleyData — adjustment reverses the admission gap") {
    val run = EndToEnd.run(spark, "BerkeleyData")
    val r   = run.report
    println("=== Fig. 4 top (measured, real 1973 aggregates) ===")
    println(EndToEnd.formatReport(r))
    println("""PAPER: SQL 0.30 (F) vs 0.46 (M) p<0.001; rewritten 0.32 (F) vs 0.27 (M) —
              |       trend REVERSED; Department has responsibility 1.0; top fine-grained
              |       triples: males applying to A/B (high acceptance), females to F (low)
              |""".stripMargin)
    assert(r.originalAnswers("Male") > r.originalAnswers("Female") + 0.1)
    assert(r.biasedTotal(), "biased w.r.t. Department")
    assert(r.covariates == Seq("Department"))
    val adj = r.totalEffect.get.answers
    assert(adj("Female") > adj("Male"), s"reversal expected, got $adj")
    assert(math.abs(r.responsibilities.head.rho - 1.0) < 1e-9)
  }
}

class Fig4CancerBench extends SparkSpec {
  test("Fig. 4 bottom: CancerData — total effect real, direct effect absent") {
    val run = EndToEnd.run(spark, "CancerData", rows = 12000)
    val r   = run.report
    println("=== Fig. 4 bottom (measured, 12k rows vs paper's 2k for stability) ===")
    println(EndToEnd.formatReport(r))
    println("""PAPER: SQL 0.60 vs 0.77 diff 0.17 p<0.001; total 0.61 vs 0.76 diff 0.14
              |       p<0.001; direct diff 0.004, p∈(0.07,0.1) insignificant;
              |       responsibility: Fatigue 0.91, Attention_Disorder 0.09
              |""".stripMargin)
    val sql = r.originalAnswers
    assert(sql("1") - sql("0") > 0.08, s"SQL diff ${sql("1") - sql("0")}")
    assert(r.covariates.toSet == Set("Smoking", "Genetics"), s"got ${r.covariates}")
    val tot = r.totalEffect.get.answers
    assert(tot("1") - tot("0") > 0.08, "total effect persists")
    val dir = r.directEffect.get.answers
    assert(math.abs(dir("1") - dir("0")) < 0.06, s"direct ≈ 0, got $dir")
    val rho = r.responsibilities.map(x => x.attribute -> x.rho).toMap
    assert(rho("Fatigue") > rho("Attention_Disorder"), s"got $rho")
  }
}
