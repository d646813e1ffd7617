package repro.core

/** Bias explanations (paper § 3.2).
  *
  * Coarse-grained: degree of responsibility of each Z ∈ V (Def. 3.3),
  *   ρ_Z = (I(T;V|Γ) − I(T;V|Z,Γ)) / Σ_V (I(T;V|Γ) − I(T;V|V,Γ)).
  *
  * Fine-grained (Alg. 3, FGE): triples (t, y, z) ranked by their
  * contribution κ to both I(T;Z) and I(Y;Z), aggregated by Borda count.
  */
object Explain {

  final case class Responsibility(attribute: String, rho: Double, drop: Double)

  /** Coarse-grained explanation: attributes of `v`, ranked by ρ (desc).
    * `stats` must already be restricted to the query context Γ.
    */
  def responsibilities(stats: StatsProvider, t: String, v: Seq[String])
      : Seq[Responsibility] = {
    require(v.nonEmpty, "no variables to explain")
    val full  = stats.cmi(Seq(t), v, Nil)
    val drops = v.map { z =>
      val rest = v.filterNot(_ == z)
      val cond = if (rest.isEmpty) 0.0 else stats.cmi(Seq(t), v, Seq(z))
      // I(T;V|Γ) − I(T;V|Z,Γ) = H(T)+H(Z)−H(TZ) ≥ 0 for Z ∈ V (footnote 1)
      z -> math.max(0.0, full - cond)
    }
    val total = drops.map(_._2).sum
    drops
      .map { case (z, d) => Responsibility(z, if (total > 0) d / total else 0.0, d) }
      .sortBy(-_.rho)
  }

  final case class Triple(t: String, y: String, z: String,
                          kappaTZ: Double, kappaYZ: Double, bordaScore: Long)

  /** Fine-grained explanation for covariate/mediator `z` (Alg. 3): rank
    * the observed triples (t, y, z) by κ_(t,z) and by κ_(y,z); aggregate
    * the two rankings with Borda's method (sum of per-ranking positions,
    * lower = better); return the top-k.
    */
  def fineGrained(stats: StatsProvider, t: String, y: String, z: String, k: Int = 3)
      : Seq[Triple] = {
    val ct   = stats.contingency(Seq(t, y, z))
    val kTZ  = Entropy.contributions(ct, t, z)
    val kYZ  = Entropy.contributions(ct, y, z)
    val triples = ct.counts.keysIterator.map { key =>
      (key(0), key(1), key(2)) // values of (t, y, z)
    }.toVector.distinct

    def ranks(score: ((String, String, String)) => Double): Map[(String, String, String), Long] =
      triples.sortBy(tr => -score(tr)).zipWithIndex
        .map { case (tr, i) => tr -> (i + 1).toLong }.toMap

    val rT = ranks { case (tv, _, zv) => kTZ.getOrElse((tv, zv), 0.0) }
    val rY = ranks { case (_, yv, zv) => kYZ.getOrElse((yv, zv), 0.0) }

    triples
      .map { case tr @ (tv, yv, zv) =>
        Triple(tv, yv, zv,
               kTZ.getOrElse((tv, zv), 0.0), kYZ.getOrElse((yv, zv), 0.0),
               rT(tr) + rY(tr))
      }
      .sortBy(tr => (tr.bordaScore, tr.t, tr.y, tr.z))
      .take(k)
  }
}
