package repro.core

/** Entropy and mutual-information estimators over contingency tables
  * (paper § 2 and Appendix 10.1). All quantities are in nats.
  */
object Entropy {

  /** Plug-in (maximum-likelihood) entropy of a contingency table. */
  def mle(ct: ContingencyTable): Double = {
    val n = ct.n.toDouble
    if (n == 0) return 0.0
    var h = 0.0
    ct.counts.valuesIterator.foreach { c =>
      if (c > 0) { val f = c / n; h -= f * math.log(f) }
    }
    h
  }

  /** Miller-Madow bias-corrected entropy estimator (§ 10.1):
    * Ĥ = Ĥ_MLE + (m − 1) / (2n), m = number of observed cells.
    */
  def millerMadow(ct: ContingencyTable): Double = {
    if (ct.n == 0) 0.0
    else mle(ct) + (ct.distinctCount - 1).toDouble / (2.0 * ct.n)
  }

  /** Ĥ(sub) from a wider table, by marginalization. */
  def millerMadow(ct: ContingencyTable, sub: Seq[String]): Double =
    millerMadow(ct.marginal(sub))

  /** Conditional entropy Ĥ(X | Z) = Ĥ(XZ) − Ĥ(Z). */
  def conditional(ct: ContingencyTable, x: Seq[String], z: Seq[String]): Double =
    if (z.isEmpty) millerMadow(ct, x)
    else millerMadow(ct, (x ++ z).distinct) - millerMadow(ct, z)

  /** Conditional mutual information
    * Î(X; Y | Z) = Ĥ(XZ) + Ĥ(YZ) − Ĥ(XYZ) − Ĥ(Z), clamped at 0.
    */
  def cmi(ct: ContingencyTable, x: Seq[String], y: Seq[String], z: Seq[String]): Double = {
    val hxz  = millerMadow(ct, (x ++ z).distinct)
    val hyz  = millerMadow(ct, (y ++ z).distinct)
    val hxyz = millerMadow(ct, (x ++ y ++ z).distinct)
    val hz   = if (z.isEmpty) 0.0 else millerMadow(ct, z)
    math.max(0.0, hxz + hyz - hxyz - hz)
  }

  /** Mutual information Î(X; Y). */
  def mi(ct: ContingencyTable, x: Seq[String], y: Seq[String]): Double =
    cmi(ct, x, y, Nil)

  /** Degree of contribution κ_(x,y) = Pr(x,y)·log(Pr(x,y)/(Pr(x)Pr(y)))
    * (Def. 3.4) for every observed pair of a 2-attribute table.
    * Returns pairs ((x, y), κ). Σκ over all pairs equals the MLE MI.
    */
  def contributions(ct: ContingencyTable, x: String, y: String)
      : Map[(String, String), Double] = {
    val t  = ct.marginal(Seq(x, y))
    val n  = t.n.toDouble
    val mx = t.marginal(Seq(x)).counts.map { case (k, c) => k(0) -> c }
    val my = t.marginal(Seq(y)).counts.map { case (k, c) => k(0) -> c }
    t.counts.map { case (k, c) =>
      val pxy = c / n
      val px  = mx(k(0)) / n
      val py  = my(k(1)) / n
      (k(0), k(1)) -> pxy * math.log(pxy / (px * py))
    }
  }
}
