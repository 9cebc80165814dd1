package repro.missing

import org.apache.spark.sql.Row
import org.apache.spark.sql.types._

import repro.core.{Candidate, EntitySource, MesaConfig, QueryTask}
import repro.info.Binning

/** Inverse Probability Weighting for extracted attributes with selection
  * bias (§3.2).
  *
  * For each attribute E whose missingness depends on observed features
  * (per [[SelectionBias]]), we fit a logistic model P(R_E=1|X) on the
  * observed features X (missing feature values are mean-imputed *for the
  * weight model only*, as in the paper) and attach the weight
  * W = P(R_E=1) / P̂(R_E=1|X), clipped for stability, to every complete
  * case as the `<attr>__w` column consumed by [[repro.core.TaskEngine]].
  *
  * Entity tables have one row per linked entity, so the logistic fits run on
  * the driver via [[LogisticRegression.fitLocal]]; bias *detection* stays a
  * batched Spark aggregation.
  */
object Ipw {

  /** Observed numeric features usable for the missingness model: nearly
    * complete numeric attributes of the source, most-complete first.
    */
  private[missing] def modelFeatures(
      source: EntitySource,
      maxFeatures: Int = 8,
      maxMissing: Double = 0.05
  ): Seq[String] = {
    val numeric = source.attrs.filter(a => Binning.isNumeric(source.table.schema(a).dataType))
    if (numeric.isEmpty) return Nil
    val mf = SelectionBias.missingFrac(source.table, numeric)
    numeric.filter(a => mf(a) <= maxMissing).sortBy(mf).take(maxFeatures)
  }

  /** Add IPW weight columns to a source for the biased attributes among
    * `candAttrs`. Returns the source unchanged when nothing is biased or no
    * model features exist.
    */
  def weightSource(source: EntitySource, candAttrs: Seq[String], cfg: MesaConfig): EntitySource = {
    val cands = source.attrs.filter(candAttrs.contains)
    if (cands.isEmpty) return source
    val feats = modelFeatures(source)
    if (feats.isEmpty) return source
    val biased = SelectionBias
      .detectBiased(source.table, cands, feats, cfg.bins, cfg.ipwBiasEps)
      .toSeq.sorted
    if (biased.isEmpty) return source

    // One collect of the tiny entity table: features + completeness flags.
    val spark = source.table.sparkSession
    import org.apache.spark.sql.functions._
    val featCols = feats.map(f => col(f).cast("double"))
    val flagCols = biased.map(a => when(col(a).isNotNull, 1.0).otherwise(0.0).as(s"__r_$a"))
    val rows = source.table.select(col(source.keyCol).cast("string") +: (featCols ++ flagCols): _*).collect()
    val n = rows.length
    if (n == 0) return source

    val p = feats.size
    val raw = Array.tabulate(n, p)((i, j) => if (rows(i).isNullAt(1 + j)) Double.NaN else rows(i).getDouble(1 + j))
    val means = Array.tabulate(p) { j =>
      val vs = (0 until n).map(raw(_)(j)).filterNot(_.isNaN)
      if (vs.isEmpty) 0.0 else vs.sum / vs.size
    }
    val x = Array.tabulate(n, p)((i, j) => if (raw(i)(j).isNaN) means(j) else raw(i)(j))

    val weightCols: Seq[(String, Array[Option[Double]])] = biased.flatMap { a =>
      val ai = 1 + p + biased.indexOf(a)
      val y  = Array.tabulate(n)(i => rows(i).getDouble(ai))
      val pObs = y.sum / n
      if (pObs <= 0.0 || pObs >= 1.0) None
      else {
        val model = LogisticRegression.fitLocal(feats, x, y)
        val w = Array.tabulate[Option[Double]](n) { i =>
          if (y(i) < 0.5) None
          else {
            val ph = math.max(model.predict(x(i)), 1e-3)
            val wi = pObs / ph
            Some(math.min(math.max(wi, 1.0 / cfg.ipwWeightClip), cfg.ipwWeightClip))
          }
        }
        Some(EntitySource.weightCol(a) -> w)
      }
    }
    if (weightCols.isEmpty) return source

    val schema = StructType(
      StructField("__ipwkey", StringType) +: weightCols.map(wc => StructField(wc._1, DoubleType))
    )
    val data = (0 until n).map { i =>
      Row.fromSeq(rows(i).getString(0) +: weightCols.map(_._2(i).map(Double.box).orNull))
    }
    val wdf = spark.createDataFrame(spark.sparkContext.parallelize(data, 1), schema)
    val joined = source.table
      .join(wdf, col(source.keyCol).cast("string") === col("__ipwkey"), "left")
      .drop("__ipwkey")
    source.copy(table = joined)
  }

  /** Weight every source of the task for the active extracted candidates. */
  def weightedTask(task: QueryTask, active: Seq[Candidate], cfg: MesaConfig): QueryTask = {
    val activeBySource = active.flatMap(c => c.sourceId.map(_ -> c.name)).groupBy(_._1)
    val sources = task.sources.map { s =>
      activeBySource.get(s.id) match {
        case Some(pairs) => weightSource(s, pairs.map(_._2), cfg)
        case None        => s
      }
    }
    task.copy(sources = sources)
  }
}
