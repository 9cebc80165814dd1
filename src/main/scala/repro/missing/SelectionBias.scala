package repro.missing

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types.{DoubleType, FloatType}

import repro.info.{Binning, InfoTheory}

/** Detection of selection bias in extracted attributes (§3.2).
  *
  * For each candidate attribute E with missing values we form the selection
  * indicator R_E (1 = value was extracted) and test whether R_E is
  * independent of the observed attributes: if MI(R_E; X) exceeds a threshold
  * for some observed feature X, the missingness is not completely-at-random
  * and complete-case analysis would be biased — those attributes get IPW
  * weights. The test is batched: one melt + aggregation scores every
  * (attribute, feature) pair at once.
  */
object SelectionBias {

  private def nullIndicator(df: DataFrame, c: String) = {
    val base = df.schema(c).dataType match {
      case DoubleType | FloatType => col(c).isNull || isnan(col(c))
      case _                      => col(c).isNull
    }
    when(base, lit("0")).otherwise(lit("1"))
  }

  /** Fraction of missing (null/NaN) values per column, one aggregation. */
  def missingFrac(df: DataFrame, cols: Seq[String]): Map[String, Double] = {
    if (cols.isEmpty) return Map.empty
    val aggs = cols.map(c => avg(when(nullIndicator(df, c) === "0", 1.0).otherwise(0.0)).as(c))
    val row  = df.agg(aggs.head, aggs.tail: _*).head()
    cols.zipWithIndex.map { case (c, i) => c -> (if (row.isNullAt(i)) 1.0 else row.getDouble(i)) }.toMap
  }

  /** MI(R_E; X) maximized over observed features X, per attribute E.
    *
    * Only attributes whose missing fraction lies in (minMissing, maxMissing]
    * are tested (fully-present attributes need no weights; near-empty ones
    * are pruned offline anyway).
    */
  def biasScores(
      table: DataFrame,
      candAttrs: Seq[String],
      featureAttrs: Seq[String],
      bins: Int,
      minMissing: Double = 0.01,
      maxMissing: Double = 0.9
  ): Map[String, Double] = {
    val mf = missingFrac(table, candAttrs)
    val testable = candAttrs.filter(a => mf(a) > minMissing && mf(a) <= maxMissing)
    val feats    = featureAttrs.filterNot(testable.contains)
    if (testable.isEmpty || feats.isEmpty) return Map.empty

    val binned = Binning.binColumns(table, feats, bins)
    // Keep incomplete feature rows: a missing feature is its own category for
    // the purposes of the dependence test.
    val base = feats.foldLeft(binned)((d, f) => d.withColumn(f, coalesce(col(f), lit("__na"))))
    val withR = base.select(
      feats.map(col) ++ testable.map(a => nullIndicator(table, a).as(s"__r_$a")): _*
    )
    val rPairs = testable.map(a => s"'$a', `__r_$a`").mkString(", ")
    val m1 = withR.selectExpr(feats.map(f => s"`$f`") :+ s"stack(${testable.size}, $rPairs) as (rattr, r)": _*)
    val fPairs = feats.map(f => s"'$f', `$f`").mkString(", ")
    val m2 = m1.selectExpr("rattr", "r", s"stack(${feats.size}, $fPairs) as (feat, fbin)")
    val cellsDf = m2
      .groupBy(col("rattr"), col("feat"), col("r"), col("fbin"))
      .agg(count(lit(1)).cast("double").as(InfoTheory.W))
      .withColumn("__g", concat_ws("\u0001", col("rattr"), col("feat")))
    InfoTheory
      .miPerGroup(cellsDf, "__g", Seq("r"), Seq("fbin"), "mi")
      .collect()
      .map { r =>
        val Array(attr, _) = r.getString(0).split('\u0001')
        attr -> r.getDouble(1)
      }
      .groupBy(_._1)
      .map { case (a, vs) => a -> vs.map(_._2).max }
  }

  /** Attributes whose missingness dependence exceeds `eps`. */
  def detectBiased(
      table: DataFrame,
      candAttrs: Seq[String],
      featureAttrs: Seq[String],
      bins: Int,
      eps: Double
  ): Set[String] =
    biasScores(table, candAttrs, featureAttrs, bins).collect { case (a, s) if s > eps => a }.toSet
}
