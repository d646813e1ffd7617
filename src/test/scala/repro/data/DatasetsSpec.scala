package repro.data

import org.apache.spark.sql.functions._
import repro.SparkSpec
import repro.core.{IndepTest, MaterializedStats, Rewrite}

class DatasetsSpec extends SparkSpec {

  private lazy val flight  = Datasets.flight(spark, rows = 40000, seed = 11).cache()
  private lazy val cancerD = Datasets.cancer(spark, rows = 12000, seed = 19).cache()

  // ----------------------------------------------------------- Flight --

  test("flight has the documented schema") {
    val cols = flight.columns.toSet
    assert(Set("Carrier", "Airport", "Year", "DepTime", "Delayed", "Month",
               "DayOfWeek", "Day", "AirportWAC", "FlightNum", "TailNum").subsetOf(cols))
  }

  test("flight exhibits Simpson's paradox: AA better overall, worse per airport") {
    val overall = Rewrite.original(flight, "Carrier", Nil, Seq("Delayed"))
      .collect().map(r => r.getString(0) -> r.getDouble(1)).toMap
    assert(overall("AA") < overall("UA"),
      s"AA=${overall("AA")} should beat UA=${overall("UA")} in the aggregate")
    val per = flight.groupBy("Airport", "Carrier").agg(avg("Delayed").as("d"))
      .collect().map(r => (r.getString(0), r.getString(1)) -> r.getDouble(2)).toMap
    for (a <- Datasets.flightAirports)
      assert(per((a, "AA")) > per((a, "UA")),
        s"at $a AA=${per((a, "AA"))} should be worse than UA=${per((a, "UA"))}")
  }

  test("flight: AA concentrates at low-delay airports (the confounding)") {
    val mix = flight.groupBy("Carrier", "Airport").count().collect()
      .map(r => (r.getString(0), r.getString(1)) -> r.getLong(2)).toMap
    def share(c: String, a: String) = {
      val tot = Datasets.flightAirports.map(x => mix.getOrElse((c, x), 0L)).sum.toDouble
      mix.getOrElse((c, a), 0L) / tot
    }
    assert(share("AA", "COS") > share("UA", "COS"))
    assert(share("UA", "ROC") > share("AA", "ROC"))
  }

  test("flight: AirportWAC is a two-way FD of Airport") {
    val pairs = flight.select("Airport", "AirportWAC").distinct().count()
    val ports = flight.select("Airport").distinct().count()
    assert(pairs == ports)
  }

  test("flight: FlightNum is key-like (high entropy)") {
    assert(flight.select("FlightNum").distinct().count() > 10000)
  }

  test("flight: Airport ⊥ Year marginally, dependent given Carrier (collider)") {
    val s = MaterializedStats(flight, Seq("Airport", "Year", "Carrier"))
    assert(IndepTest.chi2(s, "Airport", "Year", Nil).pValue > 0.01)
    assert(IndepTest.chi2(s, "Airport", "Year", Seq("Carrier")).pValue < 0.001)
  }

  test("flight is deterministic in the seed") {
    val again = Datasets.flight(spark, rows = 40000, seed = 11)
    assert(again.groupBy("Carrier").count().collect().map(r => r.getString(0) -> r.getLong(1)).toMap ==
           flight.groupBy("Carrier").count().collect().map(r => r.getString(0) -> r.getLong(1)).toMap)
  }

  // ------------------------------------------------------------ Adult --

  test("adult: big marginal income gap, small direct effect by construction") {
    val adult = Datasets.adult(spark, rows = 30000, seed = 13).cache()
    val byG = Rewrite.original(adult, "Gender", Nil, Seq("Income"))
      .collect().map(r => r.getString(0) -> r.getDouble(1)).toMap
    assert(byG("Male") - byG("Female") > 0.10,
      s"male=${byG("Male")} female=${byG("Female")}")
    // gap mostly disappears conditioning on the mediators
    val nde = Rewrite.diff(
      Rewrite.nde(adult, "Gender", "Female", Nil,
                  Seq("MaritalStatus", "Education", "HoursPerWeek", "CapitalGain", "Age"),
                  Seq("Income")),
      "Gender", "Male", "Female", "Income")
    assert(math.abs(nde) < 0.06, s"nde=$nde")
    adult.unpersist()
  }

  test("adult: marriage is strongly gender-skewed (the paper's inconsistency)") {
    val adult = Datasets.adult(spark, rows = 30000, seed = 13)
    val m = adult.groupBy("Gender", "MaritalStatus").count().collect()
      .map(r => (r.getString(0), r.getString(1)) -> r.getLong(2)).toMap
    val marriedM = m(("Male", "Married")).toDouble / (m(("Male", "Married")) + m(("Male", "Single")))
    val marriedF = m(("Female", "Married")).toDouble / (m(("Female", "Married")) + m(("Female", "Single")))
    assert(marriedM - marriedF > 0.2, s"M=$marriedM F=$marriedF")
  }

  // ---------------------------------------------------------- Staples --

  test("staples: income-price association flows only through distance") {
    val st = Datasets.staples(spark, rows = 120000, seed = 17).cache()
    val s  = MaterializedStats(st, Datasets.staplesAttrs)
    assert(IndepTest.chi2(s, "Income", "Price", Nil).pValue < 0.01)              // associated
    assert(IndepTest.chi2(s, "Income", "Price", Seq("Distance")).pValue > 0.01)  // no direct
    val byI = Rewrite.original(st, "Income", Nil, Seq("Price"))
      .collect().map(r => r.getString(0) -> r.getDouble(1)).toMap
    assert(byI("low") > byI("high"), s"low=${byI("low")} high=${byI("high")}")
    st.unpersist()
  }

  // --------------------------------------------------------- Berkeley --

  test("berkeley: exact public counts (4526 applicants)") {
    val b = Datasets.berkeley(spark)
    assert(b.count() == 4526)
    val admitted = b.filter(col("Accepted") === 1).count()
    assert(admitted == 512 + 89 + 353 + 17 + 120 + 202 + 138 + 131 + 53 + 94 + 22 + 24)
  }

  test("berkeley: aggregate disparity favors men") {
    val byG = Rewrite.original(Datasets.berkeley(spark), "Gender", Nil, Seq("Accepted"))
      .collect().map(r => r.getString(0) -> r.getDouble(1)).toMap
    assert(byG("Male") > 0.43 && byG("Male") < 0.47)
    assert(byG("Female") > 0.28 && byG("Female") < 0.32)
  }

  test("berkeley: department adjustment reverses the trend") {
    val b = Datasets.berkeley(spark)
    val adj = Rewrite.total(b, "Gender", Nil, Seq("Department"), Seq("Accepted"))
      .collect().map(r => r.getString(0) -> r.getDouble(1)).toMap
    assert(adj("Female") > adj("Male"),
      s"female=${adj("Female")} male=${adj("Male")} — Bickel et al.'s reversal")
  }

  // ----------------------------------------------------------- Cancer --

  test("cancer has all 12 LUCAS attributes") {
    assert(cancerD.columns.toSet == Datasets.cancerDag.nodes.toSet)
  }

  test("cancer: lung cancer raises car-accident rate (total effect)") {
    val byLC = Rewrite.original(cancerD, "Lung_Cancer", Nil, Seq("Car_Accident"))
      .collect().map(r => r.getString(0) -> r.getDouble(1)).toMap
    assert(byLC("1") - byLC("0") > 0.08, s"$byLC")
  }

  test("cancer: no direct effect through the mediators") {
    val nde = Rewrite.diff(
      Rewrite.nde(cancerD, "Lung_Cancer", "0", Nil,
                  Seq("Fatigue", "Attention_Disorder"), Seq("Car_Accident")),
      "Lung_Cancer", "1", "0", "Car_Accident")
    assert(math.abs(nde) < 0.06, s"nde=$nde")
  }

  test("cancer: Berkson's paradox at the Smoking collider (Ex. 10.1)") {
    val s = MaterializedStats(cancerD, Seq("Anxiety", "Peer_Pressure", "Smoking"))
    assert(IndepTest.chi2(s, "Anxiety", "Peer_Pressure", Nil).pValue > 0.01)
    assert(IndepTest.chi2(s, "Anxiety", "Peer_Pressure", Seq("Smoking")).pValue < 0.01)
  }

  test("cancer: Born_an_Even_Day is independent of everything") {
    val s = MaterializedStats(cancerD, Seq("Born_an_Even_Day", "Lung_Cancer", "Smoking"))
    assert(IndepTest.chi2(s, "Born_an_Even_Day", "Lung_Cancer", Nil).pValue > 0.01)
    assert(IndepTest.chi2(s, "Born_an_Even_Day", "Smoking", Nil).pValue > 0.01)
  }
}
