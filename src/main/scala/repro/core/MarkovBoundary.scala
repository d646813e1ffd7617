package repro.core

import repro.core.IndepTest.Tester

/** Markov-boundary discovery (paper § 2, Def. 2.4): the minimal set B with
  * (T ⊥ A − B − {T} | B). Two classic algorithms:
  *
  *  - Grow-Shrink (Margaritis & Thrun 2000) — the paper's choice;
  *  - IAMB (Tsamardinos et al. 2003) — greedy-by-association grow phase,
  *    used by the baseline comparison in § 7.4.
  */
object MarkovBoundary {

  /** Grow-Shrink: grow by adding any variable dependent on T given the
    * current set; shrink by removing variables independent given the rest.
    */
  def growShrink(stats: StatsProvider, t: String, tester: Tester,
                 candidates: Option[Seq[String]] = None): Set[String] = {
    val vars = candidates.getOrElse(stats.attributes).filterNot(_ == t).toVector
    var s    = Set.empty[String]
    // Grow
    var changed = true
    while (changed) {
      changed = false
      for (x <- vars if !s.contains(x)) {
        if (tester.dependent(stats, t, x, s.toSeq.sorted)) { s += x; changed = true }
      }
    }
    // Shrink
    var shrunk = true
    while (shrunk) {
      shrunk = false
      for (x <- s) {
        val rest = (s - x).toSeq.sorted
        if (tester.independent(stats, t, x, rest)) { s -= x; shrunk = true }
      }
    }
    s
  }

  /** IAMB: at each grow step admit the candidate with the LARGEST
    * conditional association Î(T; X | S), if dependent; then shrink.
    */
  def iamb(stats: StatsProvider, t: String, tester: Tester,
           candidates: Option[Seq[String]] = None): Set[String] = {
    val vars = candidates.getOrElse(stats.attributes).filterNot(_ == t).toVector
    var s    = Set.empty[String]
    var changed = true
    while (changed) {
      changed = false
      val remaining = vars.filterNot(s.contains)
      if (remaining.nonEmpty) {
        val scored = remaining.map(x => x -> stats.cmi(Seq(t), Seq(x), s.toSeq.sorted))
        val (best, assoc) = scored.maxBy(_._2)
        if (assoc > 0 && tester.dependent(stats, t, best, s.toSeq.sorted)) {
          s += best; changed = true
        }
      }
    }
    var shrunk = true
    while (shrunk) {
      shrunk = false
      for (x <- s) {
        val rest = (s - x).toSeq.sorted
        if (tester.independent(stats, t, x, rest)) { s -= x; shrunk = true }
      }
    }
    s
  }
}
