package repro.data

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.causal.{BayesNet, Dag}

/** Synthetic stand-ins for the paper's evaluation datasets (§ 7.1), each
  * generated from an explicit causal Bayesian network so ground truth is
  * known. See DESIGN.md § 3 for the substitution rationale. All
  * generators are deterministic in (rows, seed).
  *
  * Every categorical column is a string with meaningful labels, matching
  * what the paper's figures print.
  */
object Datasets {

  /** Map integer level strings ("0", "1", ...) to labels. */
  private def relabel(df: DataFrame, column: String, labels: Seq[String]): DataFrame =
    df.withColumn(column,
      element_at(array(labels.map(lit): _*), col(column).cast("int") + 1))

  private def p(v: Double): Array[Double] = {
    val q = math.min(0.99, math.max(0.01, v)); Array(1 - q, q)
  }
  private def root(probs: Double*): Map[Vector[Int], Array[Double]] =
    Map(Vector.empty[Int] -> probs.toArray)
  private def uniformRoot(k: Int): Map[Vector[Int], Array[Double]] =
    Map(Vector.empty[Int] -> Array.fill(k)(1.0 / k))

  // ========================================================== FlightData ==

  /** Ground-truth DAG of the synthetic FlightData. Carrier has the two
    * non-adjacent parents {Airport, Year} (the Ex. 1.1 covariates);
    * DepTime mediates Carrier → Delayed. Month/DayOfWeek/Day are noise
    * roots; AirportWAC (FD of Airport) and FlightNum/TailNum
    * (key-like) are added outside the net to exercise attribute dropping.
    */
  val flightDag: Dag = Dag(
    nodes = Vector("Airport", "Year", "Carrier", "DepTime", "Delayed",
                   "Month", "DayOfWeek", "Day"),
    edges = Seq(
      "Airport" -> "Carrier", "Year" -> "Carrier",
      "Carrier" -> "DepTime",
      "Airport" -> "Delayed", "Carrier" -> "Delayed",
      "DepTime" -> "Delayed", "Year" -> "Delayed"))

  val flightAirports = Vector("COS", "MFE", "MTJ", "ROC")
  val flightCarriers = Vector("AA", "UA")

  private val flightNet: BayesNet = {
    val baseDelay  = Array(0.12, 0.18, 0.25, 0.40)        // by airport
    val pAaByPort  = Array(0.85, 0.85, 0.50, 0.15)        // P(Carrier=AA | airport)
    val depEffect  = Array(0.00, 0.03, 0.08)              // morning/afternoon/evening
    val card = Map("Airport" -> 4, "Year" -> 4, "Carrier" -> 2, "DepTime" -> 3,
                   "Delayed" -> 2, "Month" -> 12, "DayOfWeek" -> 7, "Day" -> 28)
    val cpt = Map(
      "Airport"   -> root(0.25, 0.25, 0.20, 0.30),
      "Year"      -> uniformRoot(4),
      "Month"     -> uniformRoot(12),
      "DayOfWeek" -> uniformRoot(7),
      "Day"       -> uniformRoot(28),
      // parents sorted: (Airport, Year); value 1 = AA? keep 0 = AA, 1 = UA
      "Carrier" -> (for (a <- 0 until 4; y <- 0 until 4) yield {
        val pAA = math.min(0.95, math.max(0.05, pAaByPort(a) + 0.06 * (y - 1.5)))
        Vector(a, y) -> Array(pAA, 1 - pAA)
      }).toMap,
      // parents sorted: (Carrier); AA flies mornings, UA evenings
      "DepTime" -> Map(Vector(0) -> Array(0.5, 0.3, 0.2),
                       Vector(1) -> Array(0.2, 0.3, 0.5)),
      // parents sorted: (Airport, Carrier, DepTime, Year); AA is WORSE at
      // every airport (+0.05) yet flies from low-delay airports —
      // Simpson's paradox by construction
      "Delayed" -> (for (a <- 0 until 4; c <- 0 until 2; d <- 0 until 3; y <- 0 until 4)
        yield Vector(a, c, d, y) ->
          p(baseDelay(a) + (if (c == 0) 0.05 else 0.0) + depEffect(d) + 0.02 * (y - 1.5))
      ).toMap)
    BayesNet(flightDag, card, cpt)
  }

  /** Synthetic FlightData (default size ≈ the paper's 43 853 rows). */
  def flight(spark: SparkSession, rows: Long = 44000, seed: Long = 11): DataFrame = {
    var df = flightNet.sample(spark, rows, seed)
    df = relabel(df, "Airport", flightAirports)
    df = relabel(df, "Carrier", flightCarriers)
    df = relabel(df, "DepTime", Seq("morning", "afternoon", "evening"))
    df = df.withColumn("Year", (col("Year").cast("int") + 2012).cast("string"))
      .withColumn("Month", (col("Month").cast("int") + 1).cast("string"))
      .withColumn("DayOfWeek", (col("DayOfWeek").cast("int") + 1).cast("string"))
      .withColumn("Day", (col("Day").cast("int") + 1).cast("string"))
      .withColumn("Delayed", col("Delayed").cast("int"))
    // FD column: AirportWAC ⇒ Airport (and vice versa) — § 4 logical deps
    val wac = typedLit(Map("COS" -> "41", "MFE" -> "74", "MTJ" -> "82", "ROC" -> "22"))
    df = df.withColumn("AirportWAC", wac(col("Airport")))
    // key-like high-entropy attributes
    df.withColumn("FlightNum", pmod(hash(monotonically_increasing_id(), lit(seed)), lit(100000)).cast("string"))
      .withColumn("TailNum", concat(lit("N"),
        pmod(hash(monotonically_increasing_id(), lit(seed + 1)), lit(50000)).cast("string")))
  }

  /** Attributes eligible for covariate discovery on FlightData. */
  val flightAttrs: Seq[String] =
    Seq("Carrier", "Delayed", "Airport", "Year", "DepTime", "Month",
        "DayOfWeek", "AirportWAC", "FlightNum")

  // =========================================================== AdultData ==

  /** Gender has no parents (CD falls back to Z = MB − {Income});
    * MaritalStatus / Education / HoursPerWeek mediate Gender → Income,
    * with a small direct Gender → Income edge.
    */
  val adultDag: Dag = Dag(
    nodes = Vector("Gender", "Age", "MaritalStatus", "Education",
                   "HoursPerWeek", "CapitalGain", "Income"),
    edges = Seq(
      "Gender" -> "MaritalStatus", "Age" -> "MaritalStatus",
      "Gender" -> "Education",
      "Gender" -> "HoursPerWeek",
      "Age" -> "CapitalGain",
      "MaritalStatus" -> "Income", "Education" -> "Income",
      "HoursPerWeek" -> "Income", "CapitalGain" -> "Income",
      "Age" -> "Income", "Gender" -> "Income"))

  private val adultNet: BayesNet = {
    val card = Map("Gender" -> 2, "Age" -> 3, "MaritalStatus" -> 2, "Education" -> 3,
                   "HoursPerWeek" -> 2, "CapitalGain" -> 2, "Income" -> 2)
    // Gender: 0 = Male, 1 = Female (2:1 as in the UCI data)
    val cpt = Map(
      "Gender" -> root(0.67, 0.33),
      "Age"    -> root(0.30, 0.45, 0.25),
      // parents sorted: (Age, Gender) — married males vastly outnumber
      // married females (the paper's discovered "inconsistency")
      "MaritalStatus" -> (for (a <- 0 until 3; g <- 0 until 2) yield {
        val base = if (g == 0) 0.50 else 0.12
        val slope = if (g == 0) 0.15 else 0.10
        Vector(a, g) -> p(base + slope * a)  // P(Married)... stored as P(1)
      }).toMap.map { case (k, v) => k -> v.reverse },  // level 0 = Married
      // parents: (Gender) — males skew to higher education
      "Education" -> Map(Vector(0) -> Array(0.40, 0.30, 0.30),
                         Vector(1) -> Array(0.45, 0.35, 0.20)),
      // parents: (Gender) — P(>40h)
      "HoursPerWeek" -> Map(Vector(0) -> p(0.35), Vector(1) -> p(0.15)),
      // parents: (Age)
      "CapitalGain" -> Map(Vector(0) -> p(0.04), Vector(1) -> p(0.09), Vector(2) -> p(0.12)),
      // parents sorted: (Age, CapitalGain, Education, Gender, HoursPerWeek,
      //                  MaritalStatus)
      "Income" -> (for (a <- 0 until 3; cg <- 0 until 2; e <- 0 until 3;
                        g <- 0 until 2; h <- 0 until 2; ms <- 0 until 2) yield {
        val pv = 0.02 + 0.02 * a + 0.25 * cg + Array(0.0, 0.05, 0.18)(e) +
                 (if (g == 0) 0.02 else 0.0) + 0.10 * h + (if (ms == 0) 0.25 else 0.0)
        Vector(a, cg, e, g, h, ms) -> p(pv)
      }).toMap)
    BayesNet(adultDag, card, cpt)
  }

  def adult(spark: SparkSession, rows: Long = 48842, seed: Long = 13): DataFrame = {
    var df = adultNet.sample(spark, rows, seed)
    df = relabel(df, "Gender", Seq("Male", "Female"))
    df = relabel(df, "Age", Seq("young", "middle", "senior"))
    df = relabel(df, "MaritalStatus", Seq("Married", "Single"))
    df = relabel(df, "Education", Seq("HS-grad", "SomeCollege", "Bachelors"))
    df = relabel(df, "HoursPerWeek", Seq("<=40", ">40"))
    df = relabel(df, "CapitalGain", Seq("none", "some"))
    df.withColumn("Income", col("Income").cast("int"))
  }

  val adultAttrs: Seq[String] =
    Seq("Gender", "Income", "Age", "MaritalStatus", "Education",
        "HoursPerWeek", "CapitalGain")

  // ========================================================= StaplesData ==

  /** Income → Distance → Price chain with NO direct Income → Price edge,
    * so the direct effect is exactly zero (the WSJ "unintended
    * consequence"). Area and Education are the two non-adjacent parents
    * of Income (mirroring the real dataset's 6 columns), so CD can learn
    * PA(Income) instead of falling back.
    */
  val staplesDag: Dag = Dag(
    nodes = Vector("Area", "Education", "Income", "Distance", "Price"),
    edges = Seq("Area" -> "Income", "Education" -> "Income",
                "Area" -> "Distance", "Income" -> "Distance",
                "Distance" -> "Price"))

  private val staplesNet: BayesNet = {
    val card = Map("Area" -> 2, "Education" -> 2, "Income" -> 2,
                   "Distance" -> 2, "Price" -> 2)
    val cpt = Map(
      "Area"      -> root(0.60, 0.40),                      // 0 = urban, 1 = rural
      "Education" -> root(0.60, 0.40),                      // 0 = HS, 1 = college
      // parents sorted (Area, Education): urban & college ⇒ richer —
      // spreads large enough that the collider at Income is detectable
      "Income" -> Map(Vector(0, 0) -> p(0.35), Vector(0, 1) -> p(0.70),
                      Vector(1, 0) -> p(0.18), Vector(1, 1) -> p(0.55)),
      // parents sorted (Area, Income): P(far) — rural and low-income far
      "Distance" -> Map(Vector(0, 0) -> p(0.15), Vector(0, 1) -> p(0.05),
                        Vector(1, 0) -> p(0.65), Vector(1, 1) -> p(0.55)),
      // P(high price): far ⇒ no competitor discount
      "Price" -> Map(Vector(0) -> p(0.04), Vector(1) -> p(0.12)))
    BayesNet(staplesDag, card, cpt)
  }

  def staples(spark: SparkSession, rows: Long = 200000, seed: Long = 17): DataFrame = {
    var df = staplesNet.sample(spark, rows, seed)
    df = relabel(df, "Area", Seq("urban", "rural"))
    df = relabel(df, "Education", Seq("HS", "college"))
    df = relabel(df, "Income", Seq("low", "high"))
    df = relabel(df, "Distance", Seq("near", "far"))
    df.withColumn("Price", col("Price").cast("int"))
  }

  val staplesAttrs: Seq[String] =
    Seq("Income", "Price", "Distance", "Area", "Education")

  // ======================================================== BerkeleyData ==

  /** The REAL fall-1973 Berkeley graduate admissions aggregates for the
    * six largest departments (Bickel, Hammel & O'Connell, Science 1975 —
    * public domain), expanded to one row per applicant: 4 526 rows vs the
    * paper's 4 428 (they use a slightly different extract).
    */
  val berkeleyCounts: Seq[(String, String, Int, Int)] = Seq(
    // (dept, gender, admitted, rejected)
    ("A", "Male", 512, 313), ("A", "Female", 89, 19),
    ("B", "Male", 353, 207), ("B", "Female", 17, 8),
    ("C", "Male", 120, 205), ("C", "Female", 202, 391),
    ("D", "Male", 138, 279), ("D", "Female", 131, 244),
    ("E", "Male", 53, 138),  ("E", "Female", 94, 299),
    ("F", "Male", 22, 351),  ("F", "Female", 24, 317))

  def berkeley(spark: SparkSession): DataFrame = {
    import spark.implicits._
    val rows = berkeleyCounts.flatMap { case (d, g, adm, rej) =>
      Seq.fill(adm)((g, d, 1)) ++ Seq.fill(rej)((g, d, 0))
    }
    rows.toDF("Gender", "Department", "Accepted")
  }

  val berkeleyAttrs: Seq[String] = Seq("Gender", "Accepted", "Department")

  // ========================================================== CancerData ==

  /** The LUCAS lung-cancer DAG of Fig. 7, all 12 binary attributes.
    * There is no Lung_Cancer → Car_Accident edge: the total effect flows
    * through Fatigue (and a spurious path through Genetics /
    * Attention_Disorder), so the direct effect must test ≈ 0.
    */
  val cancerDag: Dag = Dag(
    nodes = Vector("Anxiety", "Peer_Pressure", "Smoking", "Yellow_Fingers",
                   "Genetics", "Allergy", "Lung_Cancer", "Coughing",
                   "Fatigue", "Attention_Disorder", "Car_Accident",
                   "Born_an_Even_Day"),
    edges = Seq(
      "Anxiety" -> "Smoking", "Peer_Pressure" -> "Smoking",
      "Smoking" -> "Yellow_Fingers",
      "Smoking" -> "Lung_Cancer", "Genetics" -> "Lung_Cancer",
      "Genetics" -> "Attention_Disorder",
      "Lung_Cancer" -> "Coughing", "Allergy" -> "Coughing",
      "Lung_Cancer" -> "Fatigue", "Coughing" -> "Fatigue",
      "Fatigue" -> "Car_Accident", "Attention_Disorder" -> "Car_Accident"))

  private val cancerNet: BayesNet = {
    val card = cancerDag.nodes.map(_ -> 2).toMap
    val cpt = Map(
      "Anxiety"          -> root(0.36, 0.64),
      "Peer_Pressure"    -> root(0.67, 0.33),
      "Genetics"         -> root(0.85, 0.15),
      "Allergy"          -> root(0.67, 0.33),
      "Born_an_Even_Day" -> root(0.50, 0.50),
      // parents sorted: (Anxiety, Peer_Pressure)
      "Smoking" -> Map(Vector(0, 0) -> p(0.20), Vector(0, 1) -> p(0.60),
                       Vector(1, 0) -> p(0.55), Vector(1, 1) -> p(0.85)),
      "Yellow_Fingers" -> Map(Vector(0) -> p(0.23), Vector(1) -> p(0.95)),
      // parents sorted: (Genetics, Smoking)
      "Lung_Cancer" -> Map(Vector(0, 0) -> p(0.10), Vector(0, 1) -> p(0.30),
                           Vector(1, 0) -> p(0.70), Vector(1, 1) -> p(0.95)),
      // parents sorted: (Allergy, Lung_Cancer)
      "Coughing" -> Map(Vector(0, 0) -> p(0.10), Vector(0, 1) -> p(0.80),
                        Vector(1, 0) -> p(0.70), Vector(1, 1) -> p(0.95)),
      // parents sorted: (Coughing, Lung_Cancer) — the dominant mediator
      "Fatigue" -> Map(Vector(0, 0) -> p(0.20), Vector(0, 1) -> p(0.75),
                       Vector(1, 0) -> p(0.55), Vector(1, 1) -> p(0.95)),
      "Attention_Disorder" -> Map(Vector(0) -> p(0.28), Vector(1) -> p(0.68)),
      // parents sorted: (Attention_Disorder, Fatigue)
      "Car_Accident" -> Map(Vector(0, 0) -> p(0.40), Vector(0, 1) -> p(0.75),
                            Vector(1, 0) -> p(0.70), Vector(1, 1) -> p(0.95)))
    BayesNet(cancerDag, card, cpt)
  }

  def cancer(spark: SparkSession, rows: Long = 2000, seed: Long = 19): DataFrame = {
    val df = cancerNet.sample(spark, rows, seed)
    df.withColumn("Car_Accident", col("Car_Accident").cast("int"))
  }

  val cancerAttrs: Seq[String] = cancerDag.nodes
}
