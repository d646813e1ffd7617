package repro.causal

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import scala.util.Random

/** A discrete Bayesian network over a [[Dag]]: per-node CPTs plus a
  * distributed forward sampler. This is our substitute for the R `catnet`
  * package the paper uses to draw RandomData (§ 7.1): causal DAGs admit
  * the same factorized distribution as Bayesian networks, so forward
  * sampling in topological order draws exactly from the DAG's
  * distribution.
  *
  * Sampling runs as a DataFrame program: one `rand(seed+i)` column per
  * node, then nodes are materialized in topological order via a UDF that
  * looks up the (broadcast-sized) CPT row for the realized parent values
  * and inverts its CDF.
  */
final case class BayesNet(dag: Dag, cardinality: Map[String, Int],
                          cpt: Map[String, Map[Vector[Int], Array[Double]]]) {

  /** Forward-sample `rows` tuples into a DataFrame with one string column
    * per node (values "0", "1", ... — categorical levels).
    */
  def sample(spark: SparkSession, rows: Long, seed: Long = 0): DataFrame = {
    var df = spark.range(rows).toDF("__id")
    // One uniform per node via a 64-bit hash of (row id, seed, node name):
    // unlike rand(seed + i), hash streams are independent across nodes by
    // construction (consecutive-seed XORShift streams showed measurable
    // cross-correlation at n = 40k).
    val denom = (1L << 40).toDouble
    for (node <- dag.topological)
      df = df.withColumn(s"__u_$node",
        pmod(xxhash64(col("__id"), lit(seed), lit(node)), lit(1L << 40))
          .cast("double") / denom)
    for (node <- dag.topological) {
      val parents = dag.parents(node).toVector.sorted
      val table   = cpt(node)
      val draw = udf { (parentCsv: String, u: Double) =>
        val key =
          if (parentCsv.isEmpty) Vector.empty[Int]
          else parentCsv.split(",", -1).map(_.toInt).toVector
        val probs = table(key)
        var acc = 0.0; var k = 0
        while (k < probs.length - 1 && { acc += probs(k); acc <= u }) k += 1
        k.toString
      }
      // parents encoded as CSV so root nodes (no parents) need no array()
      val parentCsv =
        if (parents.isEmpty) lit("") else concat_ws(",", parents.map(col): _*)
      df = df.withColumn(node, draw(parentCsv, col(s"__u_$node")))
    }
    df.select(dag.nodes.map(col): _*)
  }
}

object BayesNet {

  /** Random CPTs: each conditional distribution is a normalized vector of
    * Gamma(alpha, 1) draws (i.e. Dirichlet(alpha, ..., alpha)). A small
    * `alpha` (default 0.25) concentrates mass, creating strong, detectable
    * dependencies — matching how catnet draws well-separated categorical
    * networks.
    */
  def random(dag: Dag, cardinalities: Map[String, Int], seed: Long,
             alpha: Double = 0.25): BayesNet = {
    val rng = new Random(seed)
    def gammaDraw(shape: Double): Double = {
      // Marsaglia-Tsang for shape >= 1; boost for shape < 1
      if (shape < 1.0) gammaDraw(shape + 1.0) * math.pow(rng.nextDouble(), 1.0 / shape)
      else {
        val d = shape - 1.0 / 3.0
        val c = 1.0 / math.sqrt(9.0 * d)
        var res = 0.0
        var done = false
        while (!done) {
          var x = 0.0; var v = 0.0
          do { x = rng.nextGaussian(); v = 1.0 + c * x } while (v <= 0)
          v = v * v * v
          val u = rng.nextDouble()
          if (u < 1 - 0.0331 * x * x * x * x ||
              math.log(u) < 0.5 * x * x + d * (1 - v + math.log(v))) {
            res = d * v; done = true
          }
        }
        res
      }
    }
    def dirichlet(k: Int): Array[Double] = {
      val raw = Array.fill(k)(math.max(1e-9, gammaDraw(alpha)))
      val s   = raw.sum
      raw.map(_ / s)
    }
    val cpts = dag.nodes.map { node =>
      val parents = dag.parents(node).toVector.sorted
      val parentCards = parents.map(cardinalities)
      val keys = parentCards.foldLeft(Vector(Vector.empty[Int])) { (acc, c) =>
        acc.flatMap(k => (0 until c).map(k :+ _))
      }
      node -> keys.map(k => k -> dirichlet(cardinalities(node))).toMap
    }.toMap
    BayesNet(dag, cardinalities, cpts)
  }

  /** Uniform cardinality for every node. */
  def random(dag: Dag, card: Int, seed: Long): BayesNet =
    random(dag, dag.nodes.map(_ -> card).toMap, seed)
}
