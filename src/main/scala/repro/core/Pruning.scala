package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** Raw-value statistics for the offline (pre-processing) pruning phase. */
final case class OfflineStats(total: Long, nonNull: Long, distinct: Long, numeric: Boolean = false) {
  def missingFrac: Double  = if (total == 0) 1.0 else 1.0 - nonNull.toDouble / total
  def isConstant: Boolean  = distinct <= 1
  def distinctFrac: Double = if (nonNull == 0) 0.0 else distinct.toDouble / nonNull
}

/** The pruning optimizations of §4.2.
  *
  * Offline (across-queries, raw values): drop constants, attributes with
  * more than 90% missing values, and near-ID ("high entropy") attributes.
  * Online (query-specific, uses the engine's batched per-attribute
  * statistics): drop attributes in an approximate functional dependency with
  * T or O, and attributes failing the low-relevance test
  * ((O ⊥ E | C) and (O ⊥ E | C, T)).
  */
object Pruning {

  /** Batched raw-value stats for every candidate; one melt+agg per source
    * table plus one over the fact table for the in-table candidates.
    */
  def offlineStats(task: QueryTask): Map[String, OfflineStats] = {
    def meltStats(df: DataFrame, attrs: Seq[String], exact: Boolean): Map[String, OfflineStats] = {
      if (attrs.isEmpty) return Map.empty
      val numeric = attrs.map(a => a -> repro.info.Binning.isNumeric(df.schema(a).dataType)).toMap
      val total = df.count()
      val pairs = attrs.map(a => s"'$a', CAST(`$a` AS STRING)").mkString(", ")
      val long = df
        .selectExpr(s"stack(${attrs.size}, $pairs) as (attr, v)")
        .where(col("v").isNotNull && col("v") =!= "NaN")
      val distinctAgg =
        if (exact) countDistinct(col("v")).as("d") else approx_count_distinct(col("v")).as("d")
      val rows = long.groupBy("attr").agg(count(lit(1)).as("nn"), distinctAgg).collect()
      val found = rows
        .map(r => r.getString(0) -> OfflineStats(total, r.getLong(1), r.getLong(2), numeric(r.getString(0))))
        .toMap
      // Attributes that are entirely null never appear in the melt output.
      attrs.map(a => a -> found.getOrElse(a, OfflineStats(total, 0L, 0L, numeric(a)))).toMap
    }

    val fromSources = task.sources.flatMap(s => meltStats(s.table, s.attrs, exact = true))
    val fromTable   = meltStats(task.df, task.tableAttrs, exact = false)
    fromSources.toMap ++ fromTable
  }

  /** Offline pruning: returns (kept, droppedWithReason). */
  def offline(task: QueryTask, cfg: MesaConfig): (Seq[Candidate], Map[String, String]) = {
    val stats = offlineStats(task)
    val all   = task.candidates.sortBy(_.name)
    val dropped = all.flatMap { c =>
      val s = stats(c.name)
      if (s.nonNull == 0) Some(c.name -> "all values missing")
      else if (s.isConstant) Some(c.name -> "constant value")
      else if (s.missingFrac > cfg.maxMissingFrac)
        Some(c.name -> f"missing fraction ${s.missingFrac}%.2f > ${cfg.maxMissingFrac}%.2f")
      else if (!s.numeric && s.distinct >= cfg.idMinDistinct && s.distinctFrac >= cfg.idDistinctFrac)
        // The paper's WIKIID example: string attributes with (almost) one
        // value per entity. Numeric attributes are naturally near-unique and
        // get binned, so the rule only applies to strings.
        Some(c.name -> "high entropy (near-unique id)")
      else None
    }.toMap
    (all.filterNot(c => dropped.contains(c.name)), dropped)
  }

  /** Online pruning: approximate-FD and low-relevance tests (§4.2). */
  def online(
      engine: TaskEngine,
      candidates: Seq[Candidate],
      cfg: MesaConfig
  ): (Seq[Candidate], Map[String, String]) = {
    val stats = engine.onlineStats
    val dropped = candidates.flatMap { c =>
      if (!engine.hasSupport(c))
        Some(c.name -> s"entity support < ${cfg.minEntitySupport} in this context")
      else stats.get(c.name) match {
        case None => Some(c.name -> "no complete cases after join")
        case Some(s) =>
          // Lemma A.2: E => T (H(T|E) ~ 0) alone already forces
          // I(O;T|E,C) = 0 and would masquerade as a perfect explanation, so
          // the FD prune is one-directional (and likewise for O).
          if (s.hTE <= cfg.epsFd)
            Some(c.name -> "approximate FD: E determines exposure T")
          else if (s.hOE <= cfg.epsFd)
            Some(c.name -> "approximate FD: E determines outcome O")
          else if (s.relO <= cfg.epsRel && s.relOT <= cfg.epsRel)
            Some(c.name -> "low relevance: (O ⊥ E | C) and (O ⊥ E | C, T)")
          else None
      }
    }.toMap
    (candidates.filterNot(c => dropped.contains(c.name)), dropped)
  }
}
