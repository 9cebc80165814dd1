package repro.info

import org.apache.spark.sql.{Column, DataFrame}
import org.apache.spark.sql.functions._

/** Weighted plug-in estimators for entropy and (conditional) mutual
  * information over discrete (binned) attributes — the substitute for the
  * Pyitlib library used by the paper.
  *
  * Everything operates on *contingency cells*: a DataFrame whose rows are
  * distinct value combinations with a positive weight column
  * ([[InfoTheory.W]]). Cells are produced from raw data by a single
  * `groupBy(...).agg(sum(w))` — this is where Spark does the heavy lifting
  * over millions of tuples; the entropies themselves are computed with one
  * more tiny aggregation, never on the driver row-by-row.
  *
  * All quantities are in bits (log base 2), matching the magnitudes reported
  * in the paper's examples. Weights generalize counts for the IPW
  * missing-data correction of §3.2.
  *
  * `mm = true` applies the Miller–Madow bias correction
  * H_mm = H_plugin + (K-1)/(2N ln 2) (K = occupied cells, N = total weight);
  * composed through the CMI identity it removes most of the positive
  * small-sample bias of plug-in MI, which matters for the 188-row Covid-19
  * dataset. The engine uses mm everywhere; exact-identity tests use the raw
  * plug-in estimators.
  */
object InfoTheory {

  /** Name of the weight column carried by contingency-cell DataFrames. */
  val W = "__w"

  private val Log2 = math.log(2.0)
  private def log2(c: Column): Column = log(c) / lit(Log2)

  /** Build weighted contingency cells over `cols`.
    *
    * Rows with a null in any of `cols` are dropped (complete-case analysis;
    * the IPW weights compensate when selection bias was detected). When
    * `wCol` is None every row counts 1.
    */
  def cells(df: DataFrame, cols: Seq[String], wCol: Option[String] = None): DataFrame = {
    require(cols.nonEmpty, "cells: no columns")
    val complete = df.na.drop("any", cols)
    val w        = wCol.map(col).getOrElse(lit(1.0)).cast("double")
    complete
      .groupBy(cols.map(col): _*)
      .agg(sum(w).as(W))
      .where(col(W) > 0)
  }

  /** Entropy H(X) in bits from cells that contain the columns `xCols`.
    *
    * Uses H(X) = log2(Wt) - (1/Wt) * sum_x w_x log2(w_x), i.e. a single
    * aggregation pass, no per-row probability normalization.
    */
  def entropy(cellsDf: DataFrame, xCols: Seq[String], mm: Boolean = false): Double = {
    require(xCols.nonEmpty, "entropy: no columns")
    val grouped = cellsDf.groupBy(xCols.map(col): _*).agg(sum(W).as("wx"))
    val row = grouped
      .agg(sum(col("wx")).as("wt"), sum(col("wx") * log2(col("wx"))).as("s"), count(lit(1)).as("k"))
      .head()
    if (row.isNullAt(0)) 0.0
    else {
      val wt = row.getDouble(0)
      val s  = row.getDouble(1)
      val k  = row.getLong(2).toDouble
      if (wt <= 0) 0.0
      else {
        val h = math.max(0.0, math.log(wt) / Log2 - s / wt)
        if (mm) h + (k - 1) / (2.0 * wt * Log2) else h
      }
    }
  }

  /** Conditional entropy H(X|Y) = H(X,Y) - H(Y). */
  def condEntropy(cellsDf: DataFrame, xCols: Seq[String], yCols: Seq[String], mm: Boolean = false): Double =
    math.max(0.0, entropy(cellsDf, xCols ++ yCols, mm) - entropy(cellsDf, yCols, mm))

  /** Mutual information I(X;Y) = H(X) + H(Y) - H(X,Y). */
  def mi(cellsDf: DataFrame, xCols: Seq[String], yCols: Seq[String], mm: Boolean = false): Double =
    math.max(
      0.0,
      entropy(cellsDf, xCols, mm) + entropy(cellsDf, yCols, mm) - entropy(cellsDf, xCols ++ yCols, mm)
    )

  /** Conditional mutual information
    * I(X;Y|Z) = H(X,Z) + H(Y,Z) - H(X,Y,Z) - H(Z).
    * With `zCols` empty this is plain mutual information.
    */
  def cmi(
      cellsDf: DataFrame,
      xCols: Seq[String],
      yCols: Seq[String],
      zCols: Seq[String],
      mm: Boolean = false
  ): Double =
    if (zCols.isEmpty) mi(cellsDf, xCols, yCols, mm)
    else
      math.max(
        0.0,
        entropy(cellsDf, xCols ++ zCols, mm) + entropy(cellsDf, yCols ++ zCols, mm) -
          entropy(cellsDf, xCols ++ yCols ++ zCols, mm) - entropy(cellsDf, zCols, mm)
      )

  /** Per-group entropy: cells carry a group column `g` (e.g. the candidate
    * attribute's name) and this returns one H(X) per group value, allowing a
    * single Spark job to score hundreds of candidate attributes at once.
    */
  def entropyPerGroup(
      cellsDf: DataFrame,
      g: String,
      xCols: Seq[String],
      out: String,
      mm: Boolean = false
  ): DataFrame = {
    val grouped = cellsDf
      .groupBy((g +: xCols).map(col): _*)
      .agg(sum(W).as("wx"))
    val base = log2(sum(col("wx"))) - sum(col("wx") * log2(col("wx"))) / sum(col("wx"))
    val h =
      if (mm) base + (count(lit(1)).cast("double") - lit(1.0)) / (sum(col("wx")) * lit(2.0 * Log2))
      else base
    grouped.groupBy(col(g)).agg(h.as(out))
  }

  /** Per-group mutual information I(X;Y). Returns (g, out). */
  def miPerGroup(
      cellsDf: DataFrame,
      g: String,
      xCols: Seq[String],
      yCols: Seq[String],
      out: String,
      mm: Boolean = false
  ): DataFrame = {
    val hx  = entropyPerGroup(cellsDf, g, xCols, "__hx", mm)
    val hy  = entropyPerGroup(cellsDf, g, yCols, "__hy", mm)
    val hxy = entropyPerGroup(cellsDf, g, xCols ++ yCols, "__hxy", mm)
    hx.join(hy, g).join(hxy, g)
      .select(col(g), greatest(lit(0.0), col("__hx") + col("__hy") - col("__hxy")).as(out))
  }

  /** Per-group conditional mutual information I(X;Y|Z). Returns (g, out). */
  def cmiPerGroup(
      cellsDf: DataFrame,
      g: String,
      xCols: Seq[String],
      yCols: Seq[String],
      zCols: Seq[String],
      out: String,
      mm: Boolean = false
  ): DataFrame =
    if (zCols.isEmpty) miPerGroup(cellsDf, g, xCols, yCols, out, mm)
    else {
      val hxz  = entropyPerGroup(cellsDf, g, xCols ++ zCols, "__hxz", mm)
      val hyz  = entropyPerGroup(cellsDf, g, yCols ++ zCols, "__hyz", mm)
      val hxyz = entropyPerGroup(cellsDf, g, xCols ++ yCols ++ zCols, "__hxyz", mm)
      val hz   = entropyPerGroup(cellsDf, g, zCols, "__hz", mm)
      hxz.join(hyz, g).join(hxyz, g).join(hz, g)
        .select(
          col(g),
          greatest(lit(0.0), col("__hxz") + col("__hyz") - col("__hxyz") - col("__hz")).as(out)
        )
    }
}
