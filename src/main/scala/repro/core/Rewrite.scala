package repro.core

import org.apache.spark.sql.{Column, DataFrame}
import org.apache.spark.sql.functions._

/** Bias-resolving query rewriting (paper § 3.3).
  *
  * [[total]] implements Listing 2 — the adjustment formula Eq. (2): block
  * the data on the covariates Z, average each outcome per (T, X, Z)
  * block, keep only blocks where every treatment level occurs (*exact
  * matching*, the overlap requirement), and take the block-probability-
  * weighted average. Block probabilities are renormalized over the data
  * that survives pruning, per grouping context X, as § 3.3 prescribes.
  *
  * [[nde]] implements the mediator formula Eq. (3) for the natural direct
  * effect: E-hat[Y | T=t, z, m] weighted by Pr(m | t0, z)·Pr(z).
  *
  * Both are pure DataFrame transformations; [[totalSql]] emits the
  * equivalent Listing-2 SQL so tests can diff against DuckDB.
  */
object Rewrite {

  private def avgCol(y: String)  = s"avg_$y"

  /** Rewritten (unbiased) total-effect query.
    *
    * @param df already filtered by the WHERE condition C
    * @param t  treatment attribute
    * @param xs extra grouping attributes X (may be empty)
    * @param zs covariates Z
    * @param ys outcome attributes
    * @return one row per (T, X) with columns avg_<y> — the adjusted
    *         averages; contexts with no overlapping block are absent
    */
  def total(df: DataFrame, t: String, xs: Seq[String], zs: Seq[String],
            ys: Seq[String]): DataFrame = {
    require(ys.nonEmpty, "need at least one outcome")
    if (zs.isEmpty) { // no covariates: the original query is already unbiased
      return df.groupBy((t +: xs).map(col): _*)
        .agg(avg(ys.head).as(avgCol(ys.head)),
             ys.tail.map(y => avg(y).as(avgCol(y))): _*)
    }
    val nT = df.select(t).distinct().count() // #treatment levels for exact matching

    val blocks = df.groupBy((Seq(t) ++ xs ++ zs).map(col): _*)
      .agg(avg(ys.head).as(avgCol(ys.head)),
           ys.tail.map(y => avg(y).as(avgCol(y))): _*)

    val weights = df.groupBy((xs ++ zs).map(col): _*)
      .agg(count(lit(1)).as("__c"), countDistinct(col(t)).as("__nt"))
      .filter(col("__nt") === nT)            // HAVING count(DISTINCT T) = |Dom(T)|
      .drop("__nt")

    // renormalize block probabilities over the pruned data, per context X
    val norm =
      if (xs.isEmpty) weights.agg(sum("__c").as("__tot")).crossJoin(weights)
      else weights
        .groupBy(xs.map(col): _*).agg(sum("__c").as("__tot"))
        .join(weights, xs)
    val w = norm.withColumn("__w", col("__c") / col("__tot")).drop("__c", "__tot")

    blocks.join(w, xs ++ zs)
      .groupBy((t +: xs).map(col): _*)
      .agg(sum(col(avgCol(ys.head)) * col("__w")).as(avgCol(ys.head)),
           ys.tail.map(y => sum(col(avgCol(y)) * col("__w")).as(avgCol(y))): _*)
  }

  /** The Listing-2 SQL equivalent of [[total]] (same renormalization),
    * for the DuckDB oracle. `table` is the registered input table name.
    */
  def totalSql(table: String, t: String, xs: Seq[String], zs: Seq[String],
               ys: Seq[String], nTreatments: Int): String = {
    val avgSel   = ys.map(y => s"avg(CAST($y AS DOUBLE)) AS avg_$y").mkString(", ")
    val sumSel   = ys.map(y => s"sum(b.avg_$y * w.__c / n.__tot) AS avg_$y").mkString(", ")
    val xz       = (xs ++ zs).mkString(", ")
    val xsList   = xs.mkString(", ")
    val joinWB   = (xs ++ zs).map(c => s"b.$c = w.$c").mkString(" AND ")
    val joinWN   = if (xs.isEmpty) "1=1" else xs.map(c => s"w.$c = n.$c").mkString(" AND ")
    val normSel  = if (xs.isEmpty) "sum(__c) AS __tot"
                   else s"$xsList, sum(__c) AS __tot"
    val normGrp  = if (xs.isEmpty) "" else s"GROUP BY $xsList"
    s"""WITH blocks AS (
       |  SELECT $t${if (xz.nonEmpty) ", " + xz else ""}, $avgSel
       |  FROM $table GROUP BY $t${if (xz.nonEmpty) ", " + xz else ""}
       |), weights AS (
       |  SELECT $xz, count(*) AS __c
       |  FROM $table GROUP BY $xz
       |  HAVING count(DISTINCT $t) = $nTreatments
       |), norm AS (
       |  SELECT $normSel FROM weights $normGrp
       |)
       |SELECT b.$t${if (xs.nonEmpty) ", " + xs.map("b." + _).mkString(", ") else ""}, $sumSel
       |FROM blocks b
       |JOIN weights w ON $joinWB
       |JOIN norm n ON $joinWN
       |GROUP BY b.$t${if (xs.nonEmpty) ", " + xs.map("b." + _).mkString(", ") else ""}
       |""".stripMargin
  }

  /** Natural-direct-effect query (Eq. 3): per treatment level t,
    * DE(t) = Σ_{z,m} E[Y | T=t, z, m] · Pr(m | t0, z) · Pr(z),
    * restricted (and renormalized) to (z, m) cells where every treatment
    * level occurs and Pr(m | t0, z) is defined. The NDE of t1 vs t0 is
    * DE(t1) − DE(t0).
    *
    * @param t0 baseline (control) treatment value
    */
  def nde(df: DataFrame, t: String, t0: String, zs: Seq[String], ms: Seq[String],
          ys: Seq[String]): DataFrame = {
    require(ms.nonEmpty, "need at least one mediator for the direct effect")
    val nT  = df.select(t).distinct().count()
    val n0  = df.filter(col(t).cast("string") === t0)
    require(!n0.isEmpty, s"baseline treatment $t0 absent")

    val zm = zs ++ ms
    val cells = df.groupBy((Seq(t) ++ zm).map(col): _*)
      .agg(avg(ys.head).as(avgCol(ys.head)),
           ys.tail.map(y => avg(y).as(avgCol(y))): _*)

    // overlap: keep (z, m) cells containing every treatment level
    val complete = df.groupBy(zm.map(col): _*)
      .agg(countDistinct(col(t)).as("__nt"))
      .filter(col("__nt") === nT).drop("__nt")

    // Pr(m | t0, z)
    val mGiven = {
      val num = n0.groupBy(zm.map(col): _*).agg(count(lit(1)).as("__cm"))
      val den = n0.groupBy(zs.map(col): _*).agg(count(lit(1)).as("__cz"))
      val j   = if (zs.isEmpty) num.crossJoin(den) else num.join(den, zs)
      j.withColumn("__pm", col("__cm") / col("__cz")).drop("__cm", "__cz")
    }

    // Pr(z) over the full (filtered) data
    val nAll = df.count().toDouble
    val pz   =
      if (zs.isEmpty) null
      else df.groupBy(zs.map(col): _*).agg((count(lit(1)) / nAll).as("__pz"))

    val weighted0 = complete.join(mGiven, zm)
    val weighted  =
      if (zs.isEmpty) weighted0.withColumn("__pz", lit(1.0))
      else weighted0.join(pz, zs)
    val cellW = weighted.withColumn("__w0", col("__pm") * col("__pz"))
      .drop("__pm", "__pz")

    // renormalize the surviving weights so they sum to 1
    val wTot  = cellW.agg(sum("__w0").as("__wtot"))
    val withW = cellW.crossJoin(wTot).withColumn("__w", col("__w0") / col("__wtot"))
      .drop("__w0", "__wtot")

    cells.join(withW, zm)
      .groupBy(col(t))
      .agg(sum(col(avgCol(ys.head)) * col("__w")).as(avgCol(ys.head)),
           ys.tail.map(y => sum(col(avgCol(y)) * col("__w")).as(avgCol(y))): _*)
  }

  /** Listing 2 evaluated directly on a contingency table over
    * (T, Z, Y) with binary-∈-{0,1} outcome Y: returns the adjusted
    * avg(Y) per treatment level. Equivalent to [[total]] (tested) but
    * runs on the driver — used by the Q1 sweep where thousands of
    * rewritten queries share one materialized table.
    */
  def totalOnTable(ct: ContingencyTable, t: String, zs: Seq[String], y: String)
      : Map[String, Double] = {
    val tbl = ct.marginal((Seq(t) ++ zs :+ y).distinct)
    val it  = tbl.attrs.indexOf(t)
    val iy  = tbl.attrs.indexOf(y)
    val izs = zs.map(tbl.attrs.indexOf)
    // per (z-block): per-treatment (sumY, count)
    val blocks = tbl.counts.groupBy { case (k, _) => izs.map(k) }
    val tLevels = tbl.domain(t)
    val surviving = blocks.filter { case (_, cells) =>
      cells.keysIterator.map(_(it)).toSet.size == tLevels.size
    }
    val totalN = surviving.valuesIterator.map(_.values.sum).sum.toDouble
    if (totalN == 0) return Map.empty
    val acc = scala.collection.mutable.Map.empty[String, Double].withDefaultValue(0.0)
    for ((_, cells) <- surviving) {
      val w = cells.values.sum / totalN
      for (tv <- tLevels) {
        val mine = cells.filter { case (k, _) => k(it) == tv }
        val n    = mine.values.sum.toDouble
        val sumY = mine.iterator.map { case (k, c) => k(iy).toDouble * c }.sum
        if (n > 0) acc(tv) += w * (sumY / n)
      }
    }
    acc.toMap
  }

  /** The plain group-by-average answers from a contingency table. */
  def originalOnTable(ct: ContingencyTable, t: String, y: String): Map[String, Double] = {
    val tbl = ct.marginal(Seq(t, y))
    tbl.domain(t).map { tv =>
      val cells = tbl.counts.filter { case (k, _) => k(0) == tv }
      val n     = cells.values.sum.toDouble
      tv -> cells.iterator.map { case (k, c) => k(1).toDouble * c }.sum / n
    }.toMap
  }

  /** The plain (possibly biased) group-by-average query of Listing 1. */
  def original(df: DataFrame, t: String, xs: Seq[String], ys: Seq[String]): DataFrame =
    df.groupBy((t +: xs).map(col): _*)
      .agg(avg(ys.head).as(avgCol(ys.head)),
           ys.tail.map(y => avg(y).as(avgCol(y))): _*)

  /** Difference avg(t1) − avg(t0) of a (T, avg_y) result, per context X. */
  def diff(result: DataFrame, t: String, t1: String, t0: String, y: String): Double = {
    val rows = result.select(col(t).cast("string"), col(avgCol(y))).collect()
    val m    = rows.map(r => r.getString(0) -> r.getDouble(1)).toMap
    m.getOrElse(t1, Double.NaN) - m.getOrElse(t0, Double.NaN)
  }
}
