package repro.baselines

import repro.core.{CD, StatsProvider}
import repro.core.IndepTest.Tester
import repro.core.MarkovBoundary

/** Constraint-based causal-DAG discovery baselines (paper § 7.4):
  * Full Grow-Shrink (FGS, Margaritis & Thrun 2000) and IAMB
  * (Tsamardinos et al. 2003). Both follow the classic recipe:
  *
  *  1. learn the Markov boundary MB(X) of every node;
  *  2. resolve direct neighbors: X—Y iff Y ∈ MB(X) and no subset of the
  *     smaller boundary separates them;
  *  3. orient v-structures: for non-adjacent X, Z with common neighbor Y,
  *     if Y is in no separating set of (X, Z) then X → Y ← Z.
  *
  * The learned object is the partially-oriented skeleton; [[Learned.parents]]
  * returns the oriented in-edges of a node (what § 7.4's F1 scores).
  */
object StructureLearning {

  final case class Learned(
      nodes: Seq[String],
      undirected: Set[(String, String)],       // skeleton (unordered pairs as sorted tuples)
      oriented: Set[(String, String)]) {       // a -> b

    def parents(x: String): Set[String] = oriented.collect { case (a, b) if b == x => a }

    def neighborsOf(x: String): Set[String] =
      undirected.collect { case (a, b) if a == x => b
                           case (a, b) if b == x => a }
  }

  private def pair(a: String, b: String): (String, String) =
    if (a < b) (a, b) else (b, a)

  /** Shared post-MB pipeline: skeleton + v-structure orientation. */
  private def orient(stats: StatsProvider, tester: Tester, maxCond: Int,
                     mb: Map[String, Set[String]]): Learned = {
    val nodes = stats.attributes

    // --- neighbors -------------------------------------------------------
    // X—Y iff Y ∈ MB(X) and X,Y stay dependent given every S ⊆ the smaller
    // of MB(X)−{Y}, MB(Y)−{X}; remember a separating set when one exists.
    val sepset = scala.collection.mutable.Map.empty[(String, String), Seq[String]]
    val skeleton = scala.collection.mutable.Set.empty[(String, String)]
    for (x <- nodes; y <- mb(x) if x < y && mb(y).contains(x)) {
      val base =
        if ((mb(x) - y).size <= (mb(y) - x).size) (mb(x) - y) else (mb(y) - x)
      val sPool = base.toSeq.sorted
      val sep   = CD.subsets(sPool, maxCond).find(s => tester.independent(stats, x, y, s))
      sep match {
        case Some(s) => sepset(pair(x, y)) = s
        case None    => skeleton += pair(x, y)
      }
    }

    // --- v-structures ----------------------------------------------------
    val oriented = scala.collection.mutable.Set.empty[(String, String)]
    def adjacent(a: String, b: String) = skeleton.contains(pair(a, b))
    for {
      y <- nodes
      xs = nodes.filter(adjacent(_, y))
      x <- xs; z <- xs
      if x < z && !adjacent(x, z)
    } {
      val s = sepset.get(pair(x, z))
      val collider = s match {
        case Some(set) => !set.contains(y)
        case None      =>
          // x,z never both in an MB: verify with a direct test pair
          tester.independent(stats, x, z, Nil) && tester.dependent(stats, x, z, Seq(y))
      }
      if (collider) { oriented += (x -> y); oriented += (z -> y) }
    }
    Learned(nodes, skeleton.toSet, oriented.toSet)
  }

  /** FGS: Grow-Shrink Markov boundaries, then skeleton + orientation. */
  def fgs(stats: StatsProvider, tester: Tester, maxCond: Int = 3): Learned = {
    val mb = stats.attributes.map(x =>
      x -> MarkovBoundary.growShrink(stats, x, tester)).toMap
    orient(stats, tester, maxCond, symmetrize(mb))
  }

  /** IAMB variant: boundaries via IAMB's greedy grow phase. */
  def iamb(stats: StatsProvider, tester: Tester, maxCond: Int = 3): Learned = {
    val mb = stats.attributes.map(x =>
      x -> MarkovBoundary.iamb(stats, x, tester)).toMap
    orient(stats, tester, maxCond, symmetrize(mb))
  }

  /** AND-symmetrization: keep Y ∈ MB(X) only if X ∈ MB(Y) — standard
    * noise control in MB-based structure learning.
    */
  private def symmetrize(mb: Map[String, Set[String]]): Map[String, Set[String]] =
    mb.map { case (x, s) => x -> s.filter(y => mb(y).contains(x)) }
}
