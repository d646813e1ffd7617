package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions.{col, count, grouping_id, lit}
import scala.collection.mutable

/** Uniform access to the statistics HypDB needs (entropies, contingency
  * tables, CMI) with the paper's three execution strategies (§ 6):
  *
  *  - [[SparkStats]]       one distributed aggregation per entropy, with
  *                         optional entropy caching ("Caching entropy");
  *  - [[MaterializedStats]] a single materialized contingency table over
  *                         the working attribute set, marginalized on the
  *                         driver ("Materializing contingency tables");
  *  - [[CubeStats]]        a pre-computed OLAP data cube (`df.cube()`),
  *                         the paper's § 7.5 "benefits of data cubes".
  */
trait StatsProvider {

  /** Attributes this provider can answer questions about. */
  def attributes: Seq[String]

  /** Number of rows in the (filtered) relation. */
  def n: Long

  /** Contingency table over `attrs` (any subset of [[attributes]]). */
  def contingency(attrs: Seq[String]): ContingencyTable

  /** Number of entropy evaluations actually computed (not cache hits). */
  def entropyEvaluations: Long = evals
  protected var evals: Long = 0L

  /** Miller-Madow entropy Ĥ(attrs). */
  def entropy(attrs: Seq[String]): Double

  /** Conditional mutual information Î(X; Y | Z) in nats, ≥ 0. */
  def cmi(x: Seq[String], y: Seq[String], z: Seq[String]): Double = {
    val hxz  = entropy((x ++ z).distinct)
    val hyz  = entropy((y ++ z).distinct)
    val hxyz = entropy((x ++ y ++ z).distinct)
    val hz   = if (z.isEmpty) 0.0 else entropy(z)
    math.max(0.0, hxz + hyz - hxyz - hz)
  }

  def conditionalEntropy(x: Seq[String], z: Seq[String]): Double =
    if (z.isEmpty) entropy(x) else entropy((x ++ z).distinct) - entropy(z)

  /** Number of distinct values of `attrs` present in the data. */
  def distinctCount(attrs: Seq[String]): Long = contingency(attrs).distinctCount.toLong
}

/** One Spark aggregation per contingency table / entropy. `cache = true`
  * memoizes both, keyed on the (canonicalized) attribute set.
  */
final class SparkStats(df: DataFrame, val attributes: Seq[String], cacheEnabled: Boolean = true)
    extends StatsProvider {

  private val ctCache = mutable.Map.empty[Vector[String], ContingencyTable]
  private val hCache  = mutable.Map.empty[Vector[String], Double]

  lazy val n: Long = df.count()

  private def key(attrs: Seq[String]): Vector[String] = attrs.sorted.toVector

  def contingency(attrs: Seq[String]): ContingencyTable = {
    val k = key(attrs)
    def build = Contingency.fromDf(df, attrs)
    if (cacheEnabled) ctCache.getOrElseUpdate(k, build) else build
  }

  def entropy(attrs: Seq[String]): Double = {
    val k = key(attrs)
    def compute: Double = { evals += 1; Entropy.millerMadow(contingency(attrs)) }
    if (cacheEnabled) hCache.getOrElseUpdate(k, compute) else compute
  }
}

/** Materializes the full contingency table over `attributes` with ONE
  * distributed aggregation; everything after that is driver-side
  * marginalization. Entropies are always memoized (they are derived data).
  */
final class MaterializedStats(val table: ContingencyTable) extends StatsProvider {
  val attributes: Seq[String] = table.attrs
  val n: Long                 = table.n

  private val hCache = mutable.Map.empty[Vector[String], Double]

  def contingency(attrs: Seq[String]): ContingencyTable = table.marginal(attrs)

  def entropy(attrs: Seq[String]): Double =
    hCache.getOrElseUpdate(attrs.sorted.toVector, {
      evals += 1
      Entropy.millerMadow(table, attrs)
    })
}

object MaterializedStats {
  def apply(df: DataFrame, attrs: Seq[String]): MaterializedStats =
    new MaterializedStats(Contingency.fromDf(df, attrs))
}

/** A pre-computed OLAP data cube: `df.cube(attrs).count()` gives the
  * counts of EVERY attribute subset in one pass; `grouping_id()` tells
  * which subset each output row belongs to. Marginal contingency tables
  * are then O(lookup) — the paper's § 7.5 data-cube experiment.
  */
final class CubeStats(val attributes: Seq[String],
                      cube: Map[Vector[String], Map[Vector[String], Long]],
                      val n: Long)
    extends StatsProvider {

  private val hCache = mutable.Map.empty[Vector[String], Double]

  def contingency(attrs: Seq[String]): ContingencyTable = {
    val k = attrs.toVector.sortBy(attributes.indexOf)
    val m = cube.getOrElse(k,
      throw new IllegalArgumentException(s"subset $k not in cube over $attributes"))
    // reorder key columns from cube order to requested order
    val pos = attrs.map(k.indexOf)
    ContingencyTable(attrs.toVector, m.map { case (kk, c) => pos.map(kk).toVector -> c })
  }

  def entropy(attrs: Seq[String]): Double =
    hCache.getOrElseUpdate(attrs.sorted.toVector, {
      evals += 1
      Entropy.millerMadow(contingency(attrs))
    })
}

object CubeStats {

  /** Pre-compute the data cube over `attrs` (≤ ~12 attributes, as in the
    * paper/PostgreSQL) with a single `cube()` aggregation.
    */
  def apply(df: DataFrame, attrs: Seq[String]): CubeStats = {
    require(attrs.size <= 16, s"cube over ${attrs.size} attrs would have 2^${attrs.size} groupings")
    val k = attrs.size
    val rows = df
      .cube(attrs.map(a => col(a).cast("string")): _*)
      .agg(count(lit(1)).as("cnt"), grouping_id().as("gid"))
      .collect()
    val byGid = rows.groupBy(_.getLong(k + 1))
    val cube  = byGid.map { case (gid, rs) =>
      // grouping_id bit i set (counting from the LEFT attr as the highest
      // bit) means attr i was rolled up (NOT part of this grouping set)
      val present = (0 until k).filter(i => (gid & (1L << (k - 1 - i))) == 0L).toVector
      val key     = present.map(attrs)
      val counts  = rs.map { r =>
        present.map(i => Option(r.getString(i)).getOrElse("∅")).toVector -> r.getLong(k)
      }.toMap
      key -> counts
    }
    val n = cube.getOrElse(Vector.empty, Map(Vector.empty[String] -> 0L)).values.sum
    new CubeStats(attrs, cube, n)
  }
}
