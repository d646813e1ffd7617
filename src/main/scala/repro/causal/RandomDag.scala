package repro.causal

import scala.util.Random

/** Erdős–Rényi random DAG generator (paper § 7.1, "RandomData"): pick a
  * random node order and include each forward edge with probability p.
  * The paper's DAGs have 8/16/32 nodes with small expected fan-in; we
  * parameterize by expected parents per node and cap the in-degree so
  * contingency tables stay tractable.
  */
object RandomDag {

  def generate(nNodes: Int, expectedParents: Double, seed: Long,
               maxInDegree: Int = 3): Dag = {
    val rng   = new Random(seed)
    val nodes = Vector.tabulate(nNodes)(i => f"V$i%02d")
    val order = rng.shuffle(nodes)
    val p     = math.min(1.0, expectedParents / math.max(1.0, (nNodes - 1) / 2.0))
    val edges = scala.collection.mutable.Set.empty[(String, String)]
    val inDeg = scala.collection.mutable.Map(nodes.map(_ -> 0): _*)
    for (j <- order.indices; i <- 0 until j) {
      if (inDeg(order(j)) < maxInDegree && rng.nextDouble() < p) {
        edges += (order(i) -> order(j))
        inDeg(order(j)) += 1
      }
    }
    Dag(nodes, edges.toSet)
  }
}
