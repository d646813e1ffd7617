package repro.baselines

import repro.core.{ContingencyTable, Gamma, StatsProvider}
import scala.collection.mutable

/** Score-based greedy DAG search (paper § 7.4 baselines): hill climbing
  * over add / delete / reverse single-edge moves, with the decomposable
  * scores AIC, BIC, and BDeu ("BDe" in the paper, uniform prior).
  *
  * All scores are functions of per-family contingency tables
  * (node + its parents), so each family score is one marginalization of
  * the materialized table; scores are cached by (node, parent-set).
  */
object ScoreSearch {

  sealed trait Score { def name: String }
  case object AIC extends Score { val name = "aic" }
  case object BIC extends Score { val name = "bic" }
  case object BDe extends Score { val name = "bde" }

  final case class Result(edges: Set[(String, String)], score: Double) {
    def parents(x: String): Set[String] = edges.collect { case (a, b) if b == x => a }
  }

  /** Decomposable family score of `node` given `parents`. */
  private def familyScore(stats: StatsProvider, node: String, parents: Seq[String],
                          score: Score): Double = {
    val ct  = stats.contingency((node +: parents).distinct)
    val n   = ct.n.toDouble
    val r   = math.max(1, ct.marginal(Seq(node)).distinctCount) // node cardinality
    val q   = if (parents.isEmpty) 1 else math.max(1, ct.marginal(parents).distinctCount)
    score match {
      case AIC | BIC =>
        // log-likelihood = −n·H(node | parents) (MLE, nats)
        val hCond = {
          val hJoint = repro.core.Entropy.mle(ct)
          val hPar   = if (parents.isEmpty) 0.0 else repro.core.Entropy.mle(ct.marginal(parents))
          hJoint - hPar
        }
        val ll     = -n * hCond
        val params = (r - 1).toDouble * q
        if (score == AIC) ll - params else ll - 0.5 * params * math.log(n)
      case BDe =>
        bdeu(ct, node, parents, iss = 1.0)
    }
  }

  /** BDeu score with imaginary sample size `iss` (uniform Dirichlet). */
  private def bdeu(ct: ContingencyTable, node: String, parents: Seq[String],
                   iss: Double): Double = {
    val r = math.max(1, ct.marginal(Seq(node)).distinctCount)
    // group family counts by parent configuration
    val byParent: Map[Vector[String], Iterable[Long]] =
      if (parents.isEmpty) Map(Vector.empty[String] -> ct.marginal(Seq(node)).counts.values)
      else {
        val fam = ct.marginal(node +: parents)
        val iN  = fam.attrs.indexOf(node)
        fam.counts.groupBy { case (k, _) => k.patch(iN, Nil, 1) }
          .map { case (pk, m) => pk -> m.values }
      }
    val q     = math.max(1, byParent.size) // observed parent configs
    val aj    = iss / q
    val ajk   = iss / (q.toDouble * r)
    byParent.valuesIterator.map { counts =>
      val nj = counts.sum.toDouble
      Gamma.logGamma(aj) - Gamma.logGamma(aj + nj) +
        counts.iterator.map(c => Gamma.logGamma(ajk + c) - Gamma.logGamma(ajk)).sum
    }.sum
  }

  /** Greedy hill climbing from the empty graph. */
  def hillClimb(stats: StatsProvider, score: Score, maxParents: Int = 3,
                maxIters: Int = 200): Result = {
    val nodes = stats.attributes.toVector
    val cache = mutable.Map.empty[(String, Set[String]), Double]
    def fam(x: String, ps: Set[String]): Double =
      cache.getOrElseUpdate((x, ps), familyScore(stats, x, ps.toSeq.sorted, score))

    var edges  = Set.empty[(String, String)]
    def parentsOf(x: String) = edges.collect { case (a, b) if b == x => a }

    def creatsCycle(from: String, to: String, es: Set[(String, String)]): Boolean = {
      // cycle iff `from` reachable from `to`
      var seen = Set(to); var frontier = Set(to)
      while (frontier.nonEmpty) {
        frontier = frontier.flatMap(n => es.collect { case (a, b) if a == n => b }) -- seen
        seen ++= frontier
        if (seen.contains(from)) return true
      }
      false
    }

    var improved = true
    var iter     = 0
    var current  = nodes.map(x => fam(x, parentsOf(x).toSet)).sum
    while (improved && iter < maxIters) {
      improved = false
      iter += 1
      var bestDelta = 1e-9
      var bestMove: () => Unit = () => ()
      // additions
      for (a <- nodes; b <- nodes if a != b && !edges((a, b)) && !edges((b, a))) {
        val pb = parentsOf(b).toSet
        if (pb.size < maxParents && !creatsCycle(a, b, edges)) {
          val d = fam(b, pb + a) - fam(b, pb)
          if (d > bestDelta) { bestDelta = d; bestMove = () => edges += (a -> b) }
        }
      }
      // deletions
      for ((a, b) <- edges) {
        val pb = parentsOf(b).toSet
        val d  = fam(b, pb - a) - fam(b, pb)
        if (d > bestDelta) { bestDelta = d; bestMove = () => edges -= (a -> b) }
      }
      // reversals
      for ((a, b) <- edges) {
        val pa = parentsOf(a).toSet; val pb = parentsOf(b).toSet
        if (pa.size < maxParents && !creatsCycle(b, a, edges - (a -> b))) {
          val d = (fam(b, pb - a) - fam(b, pb)) + (fam(a, pa + b) - fam(a, pa))
          if (d > bestDelta) {
            bestDelta = d; bestMove = () => { edges -= (a -> b); edges += (b -> a) }
          }
        }
      }
      if (bestDelta > 1e-9) { bestMove(); current += bestDelta; improved = true }
    }
    Result(edges, current)
  }
}
