package repro.info

import org.apache.spark.sql.{Column, DataFrame}
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types._

/** Discretization of attributes for plug-in information-theoretic estimation.
  *
  * The paper (§2.2, §4.3) bins every numerical attribute before estimating
  * entropy / (conditional) mutual information, and treats categorical values
  * as their own bins. We use equi-depth (quantile) binning: boundaries come
  * from one `approxQuantile` pass over all columns. Equi-width bins would
  * collapse heavy-tailed attributes (population, GDP) into a single bucket
  * and destroy their explanatory power.
  *
  * Bin labels are strings ("b0".."b{B-1}"); missing values (null / NaN) stay
  * null so that downstream complete-case logic (§3.2) can recognize them.
  */
object Binning {

  /** Default number of bins for numerical attributes. */
  val DefaultBins = 6

  def isNumeric(dt: DataType): Boolean = dt match {
    case _: NumericType => true
    case _              => false
  }

  private def nullSafe(c: Column, dt: DataType): Column = dt match {
    case DoubleType | FloatType => when(c.isNull || isnan(c), lit(null)).otherwise(c)
    case _                      => c
  }

  /** Equi-width bin label for a numeric column with known [lo, hi] — used by
    * tests and by callers with a fixed range.
    */
  def binExpr(c: Column, lo: Double, hi: Double, bins: Int): Column = {
    require(bins >= 1, s"bins must be >= 1, got $bins")
    if (!(hi > lo) || hi.isNaN || lo.isNaN) {
      when(c.isNull, lit(null)).otherwise(lit("b0"))
    } else {
      val idx     = floor((c - lit(lo)) / lit(hi - lo) * lit(bins)).cast(IntegerType)
      val clipped = least(greatest(idx, lit(0)), lit(bins - 1))
      when(c.isNull, lit(null)).otherwise(concat(lit("b"), clipped.cast(StringType)))
    }
  }

  /** Quantile-boundary bin label: the bin index is the number of boundaries
    * strictly below the value.
    */
  def quantileBinExpr(c: Column, boundaries: Seq[Double]): Column = {
    if (boundaries.isEmpty) return when(c.isNull, lit(null)).otherwise(lit("b0"))
    val idx = boundaries.foldLeft(lit(0)) { (acc, b) => acc + when(c > lit(b), 1).otherwise(0) }
    when(c.isNull, lit(null)).otherwise(concat(lit("b"), idx.cast(StringType)))
  }

  /** Replace each column in `cols` by its bin label (string).
    *
    * Numeric columns are equi-depth binned into at most `bins` buckets using
    * a single approxQuantile pass over all of them; other columns are cast
    * to string. Null / NaN values remain null.
    */
  def binColumns(df: DataFrame, cols: Seq[String], bins: Int = DefaultBins): DataFrame = {
    require(cols.nonEmpty, "binColumns: no columns given")
    val types   = df.schema.fields.map(f => f.name -> f.dataType).toMap
    val missing = cols.filterNot(types.contains)
    require(missing.isEmpty, s"binColumns: columns not in schema: $missing")

    val numeric = cols.filter(c => isNumeric(types(c)))
    val bounds: Map[String, Seq[Double]] =
      if (numeric.isEmpty) Map.empty
      else {
        // NaN-cleaned projection for the quantile sketch only.
        val cleaned = df.select(numeric.map(c => nullSafe(col(c), types(c)).cast(DoubleType).as(c)): _*)
        val probs   = (1 until bins).map(_.toDouble / bins).toArray
        val qs      = cleaned.stat.approxQuantile(numeric.toArray, probs, 0.001)
        numeric.zip(qs).map { case (c, q) =>
          // Deduplicated interior boundaries; constant columns get none.
          c -> Option(q).map(_.toSeq.distinct.sorted).getOrElse(Nil)
        }.toMap
      }

    // One select (not withColumn-per-attr, which is quadratic in plan
    // analysis for hundreds of extracted attributes).
    val toBin = cols.toSet
    val projected = df.columns.map { c =>
      if (!toBin(c)) col(c)
      else if (bounds.contains(c))
        quantileBinExpr(nullSafe(col(c), types(c)).cast(DoubleType), bounds(c)).as(c)
      else col(c).cast(StringType).as(c)
    }
    df.select(projected.toIndexedSeq: _*)
  }
}
