package repro.core

import scala.util.Random

/** Result of a conditional-independence test of (X ⊥ Y | Z). */
final case class TestResult(
    stat: Double,          // Î(X; Y | Z) in nats (the estimated CMI)
    pValue: Double,        // significance of the statistic
    ciLow: Double,         // 95% CI around pValue (MIT only; == pValue for χ²)
    ciHigh: Double,
    method: String) {

  /** Independence is retained (null not rejected) at level `alpha`. */
  def independent(alpha: Double): Boolean = pValue > alpha
  def dependent(alpha: Double): Boolean   = !independent(alpha)
}

/** Conditional-independence tests (paper § 5, § 6).
  *
  * All tests consume a [[StatsProvider]]; the data never leaves its
  * contingency-table summary. `Z` may be empty (marginal independence).
  */
object IndepTest {

  /** Counts tests performed — Fig. 6(a) reports #tests per algorithm. */
  final class Counter { var tests: Long = 0L }

  // ---------------------------------------------------------------- χ² --

  /** G-test: 2n·Î_MLE(X;Y|Z) ~ χ²_df with
    * df = (|X|−1)(|Y|−1)·|Π_Z|  (paper § 6).
    */
  def chi2(stats: StatsProvider, x: String, y: String, z: Seq[String]): TestResult = {
    val ct = stats.contingency((Seq(x, y) ++ z).distinct)
    chi2OnTable(ct, x, y, z)
  }

  def chi2OnTable(ct: ContingencyTable, x: String, y: String,
                  z: Seq[String]): TestResult = {
    val dx = math.max(1L, ct.marginal(Seq(x)).distinctCount.toLong)
    val dy = math.max(1L, ct.marginal(Seq(y)).distinctCount.toLong)
    val dz = if (z.isEmpty) 1L else math.max(1L, ct.marginal(z).distinctCount.toLong)
    val df = math.max(1L, (dx - 1) * (dy - 1) * dz)
    // plug-in (MLE) CMI for the G statistic
    val hxz  = Entropy.mle(ct.marginal((Seq(x) ++ z).distinct))
    val hyz  = Entropy.mle(ct.marginal((Seq(y) ++ z).distinct))
    val hxyz = Entropy.mle(ct)
    val hz   = if (z.isEmpty) 0.0 else Entropy.mle(ct.marginal(z))
    val i    = math.max(0.0, hxz + hyz - hxyz - hz)
    val g    = 2.0 * ct.n * i
    val p    = Gamma.chiSquaredPValue(g, df.toDouble)
    TestResult(i, p, p, p, "chi2")
  }

  // --------------------------------------------------------------- MIT --

  /** MIT (Alg. 2): Monte-Carlo permutation test for Î(X; Y | Z) using
    * Patefield samples of per-group contingency tables. `groupFraction`
    * < 1 enables the § 5 "sampling from groups" optimization: only the
    * top groups by weight w_z = Pr(z)·max(H(X|z), H(Y|z)) are simulated.
    *
    * Returns p̂ with its 95% binomial CI (Alg. 2 line 13).
    */
  def mit(stats: StatsProvider, x: String, y: String, z: Seq[String],
          m: Int = 100, rng: Random = new Random(0),
          groupFraction: Double = 1.0): TestResult = {
    val ct = stats.contingency((Seq(x, y) ++ z).distinct)
    mitOnTable(ct, x, y, z, m, rng, groupFraction)
  }

  def mitOnTable(ct: ContingencyTable, x: String, y: String, z: Seq[String],
                 m: Int, rng: Random, groupFraction: Double = 1.0): TestResult = {
    val n = ct.n.toDouble
    if (n == 0) return TestResult(0, 1, 1, 1, "mit")

    // groups z ∈ Π_Z(D); for Z = ∅ there is a single group
    val groups: Seq[(Double, Array[Array[Long]])] = {
      val gs = if (z.isEmpty) Map(Vector.empty[String] -> ct) else ct.groupBy(z)
      gs.toSeq.map { case (_, sub) =>
        val (_, _, mtx) = sub.matrix(x, y)
        (sub.n / n, mtx)
      }
    }

    // observed statistic over ALL groups: Î(X;Y|Z) = Σ_z Pr(z)·Î_z(X;Y)
    def weightedStat(sel: Seq[(Double, Array[Array[Long]])],
                     tables: Seq[Array[Array[Long]]]): Double =
      sel.iterator.zip(tables.iterator).map { case ((w, _), t) => w * Patefield.tableMi(t) }.sum

    // group sampling (§ 5): keep the top ceil(frac·|groups|) groups by
    // weight w_z = Pr(z)·max(H(X|z), H(Y|z)); renormalize Pr(z) over them
    val selected: Seq[(Double, Array[Array[Long]])] =
      if (groupFraction >= 1.0 || groups.size <= 1) groups
      else {
        def margEntropy(mtx: Array[Array[Long]], overRows: Boolean): Double = {
          val sums = if (overRows) mtx.map(_.sum)
                     else mtx.transpose.map(_.sum)
          val tot  = sums.sum.toDouble
          if (tot == 0) 0.0
          else -sums.iterator.filter(_ > 0).map(c => (c / tot) * math.log(c / tot)).sum
        }
        val k = math.max(1, math.ceil(groupFraction * groups.size).toInt)
        val byWeight = groups.sortBy { case (w, mtx) =>
          -(w * math.max(margEntropy(mtx, overRows = true), margEntropy(mtx, overRows = false)))
        }.take(k)
        val wSum = byWeight.map(_._1).sum
        if (wSum <= 0) byWeight else byWeight.map { case (w, t) => (w / wSum, t) }
      }

    val s0 = weightedStat(selected, selected.map(_._2))

    // permutation samples: per group, Patefield tables with the observed
    // marginals; aggregate with the same weights (Alg. 2 lines 7-12)
    var exceed = 0
    var trial  = 0
    while (trial < m) {
      val si = selected.iterator.map { case (w, mtx) =>
        val rs = mtx.map(_.sum)
        val cs = Array.tabulate(mtx(0).length)(j => mtx.map(_(j)).sum)
        w * Patefield.tableMi(Patefield.sample(rs, cs, rng))
      }.sum
      if (si >= s0) exceed += 1
      trial += 1
    }
    val p  = exceed.toDouble / m
    val se = 1.96 * math.sqrt(p * (1 - p) / m)
    TestResult(s0, p, math.max(0, p - se), math.min(1, p + se),
               if (groupFraction < 1.0) "mit-sampled" else "mit")
  }

  // ------------------------------------------------------------- HyMIT --

  /** Hybrid test (§ 6): χ² when the sample is large relative to the
    * degrees of freedom (df ≤ n/β, β = 5), MIT with group sampling
    * otherwise.
    */
  def hymit(stats: StatsProvider, x: String, y: String, z: Seq[String],
            beta: Double = 5.0, m: Int = 100, rng: Random = new Random(0),
            groupFraction: Double = 1.0): TestResult = {
    val ct = stats.contingency((Seq(x, y) ++ z).distinct)
    val dx = math.max(1L, ct.marginal(Seq(x)).distinctCount.toLong)
    val dy = math.max(1L, ct.marginal(Seq(y)).distinctCount.toLong)
    val dz = if (z.isEmpty) 1L else math.max(1L, ct.marginal(z).distinctCount.toLong)
    val df = (dx - 1) * (dy - 1) * dz
    if (df <= ct.n / beta) chi2OnTable(ct, x, y, z)
    else mitOnTable(ct, x, y, z, m, rng, groupFraction)
  }

  /** A conditional-independence oracle with a fixed test configuration,
    * threaded through Grow-Shrink / CD / the baselines.
    */
  final case class Tester(
      alpha: Double = 0.01,
      method: String = "hymit",          // "chi2" | "mit" | "mit-sampled" | "hymit"
      m: Int = 100,
      beta: Double = 5.0,
      groupFraction: Double = 1.0,
      seed: Long = 0,
      minEffect: Double = 0.0,           // CMI below this never counts as dependence
      counter: Counter = new Counter) {

    def run(stats: StatsProvider, x: String, y: String, z: Seq[String]): TestResult = {
      counter.tests += 1
      val rng = new Random(seed + counter.tests) // deterministic per call
      method match {
        case "chi2"        => chi2(stats, x, y, z)
        case "mit"         => mit(stats, x, y, z, m, rng)
        case "mit-sampled" => mit(stats, x, y, z, m, rng,
                                  groupFraction = effectiveFraction(stats, z))
        case "hymit"       => hymit(stats, x, y, z, beta, m, rng,
                                    groupFraction = effectiveFraction(stats, z))
        case other         => throw new IllegalArgumentException(s"unknown test $other")
      }
    }

    /** § 7.3: sample a number of groups proportional to log(|Π_Z(D)|). */
    private def effectiveFraction(stats: StatsProvider, z: Seq[String]): Double = {
      if (groupFraction < 1.0) return groupFraction
      if (z.isEmpty) return 1.0
      val g = stats.distinctCount(z).toDouble
      if (g <= 8) 1.0 else math.min(1.0, 4.0 * math.log(g) / g)
    }

    def independent(stats: StatsProvider, x: String, y: String, z: Seq[String]): Boolean = {
      val r = run(stats, x, y, z)
      // a rejection with a vanishing effect size is treated as noise —
      // guards the many near-null tests CD performs at α = 0.01
      r.independent(alpha) || r.stat < minEffect
    }

    def dependent(stats: StatsProvider, x: String, y: String, z: Seq[String]): Boolean =
      !independent(stats, x, y, z)
  }
}
