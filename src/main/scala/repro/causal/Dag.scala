package repro.causal

/** A causal DAG over named attributes (paper § 2, Appendix 10.1).
  * Serves as ground truth for tests/benches: parents, Markov boundaries,
  * d-separation.
  */
final case class Dag(nodes: Vector[String], edges: Set[(String, String)]) {
  require(edges.forall { case (a, b) => nodes.contains(a) && nodes.contains(b) },
    "edge endpoints must be nodes")

  def parents(x: String): Set[String]  = edges.collect { case (a, b) if b == x => a }
  def children(x: String): Set[String] = edges.collect { case (a, b) if a == x => b }
  def neighbors(x: String): Set[String] = parents(x) ++ children(x)

  /** Markov boundary from structure (Prop. 2.5): parents ∪ children ∪
    * parents-of-children (spouses).
    */
  def markovBoundary(x: String): Set[String] =
    (parents(x) ++ children(x) ++ children(x).flatMap(parents)) - x

  /** Nodes in a topological order (parents before children). */
  lazy val topological: Vector[String] = {
    val inDeg = scala.collection.mutable.Map(nodes.map(n => n -> parents(n).size): _*)
    val out   = scala.collection.mutable.ArrayBuffer.empty[String]
    val queue = scala.collection.mutable.Queue(nodes.filter(inDeg(_) == 0).sorted: _*)
    while (queue.nonEmpty) {
      val n = queue.dequeue()
      out += n
      for (c <- children(n).toSeq.sorted) {
        inDeg(c) -= 1
        if (inDeg(c) == 0) queue.enqueue(c)
      }
    }
    require(out.size == nodes.size, "graph has a cycle")
    out.toVector
  }

  def isAcyclic: Boolean = scala.util.Try(topological).isSuccess

  /** Descendants of x (not including x). */
  def descendants(x: String): Set[String] = {
    var seen = Set.empty[String]
    var frontier = children(x)
    while (frontier.nonEmpty) {
      seen ++= frontier
      frontier = frontier.flatMap(children) -- seen
    }
    seen
  }

  /** d-separation: (X ⊥ Y |_d Z)? Standard reachability ("Bayes ball")
    * over the moralized-path rules: a path is blocked iff it contains a
    * chain/fork node in Z, or a collider whose descendants (incl. itself)
    * avoid Z.
    */
  def dSeparated(x: String, y: String, z: Set[String]): Boolean = {
    if (x == y) return false
    // reachable set of (node, direction) pairs; direction = arrived via
    // incoming (true) or outgoing (false) edge
    val anc = {
      var a = z
      var frontier = z.flatMap(parents)
      while (frontier.nonEmpty) { a ++= frontier; frontier = frontier.flatMap(parents) -- a }
      a
    }
    val visited = scala.collection.mutable.Set.empty[(String, Boolean)]
    val queue   = scala.collection.mutable.Queue((x, true), (x, false))
    while (queue.nonEmpty) {
      val (node, up) = queue.dequeue() // up = traversing towards parents
      if (!visited((node, up))) {
        visited += ((node, up))
        if (node == y && node != x) return false
        if (up && !z.contains(node)) {
          for (p <- parents(node)) queue.enqueue((p, true))
          for (c <- children(node)) queue.enqueue((c, false))
        } else if (!up) {
          if (!z.contains(node)) for (c <- children(node)) queue.enqueue((c, false))
          if (anc.contains(node)) for (p <- parents(node)) queue.enqueue((p, true))
        }
      }
    }
    !visited.exists(_._1 == y)
  }
}

object Dag {
  def fromEdges(edges: (String, String)*): Dag = {
    val nodes = edges.flatMap { case (a, b) => Seq(a, b) }.distinct.toVector
    Dag(nodes, edges.toSet)
  }

  def apply(nodes: Seq[String], edges: Seq[(String, String)]): Dag =
    Dag(nodes.toVector, edges.toSet)
}
