package repro.kg

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

import repro.core.EntitySource

/** Extraction of candidate attributes from a KG (§3.1).
  *
  * Given the fact table and a linking column, this builds the *universal
  * relation*: one row per distinct surface value of the column (including
  * unlinked values, whose attributes are all null), one column per property
  * reachable within `hops` hops of the linked entity.
  *
  *  - Hop 1 collects the entity's literal properties.
  *  - Hop h>1 follows entity-valued properties: property q of the entity
  *    referenced by p becomes the column `p_q` (e.g. `Leader_Age`).
  *  - One-to-many values (a property with several objects for one subject)
  *    are aggregated: numeric properties by mean, string properties by min —
  *    the paper's "Avg Population size of Ethnic-Group" pattern.
  *
  * Column names are sanitized to `[A-Za-z0-9_]` and prefixed with `prefix`
  * so the same KG can back several sources (e.g. origin vs destination city).
  */
object AttributeExtractor {

  private def sanitize(s: String): String = s.replaceAll("[^A-Za-z0-9_]", "_")

  /** (value, attr, v, vn) long form of all properties reachable in `hops`. */
  private def propertiesLong(linked: DataFrame, kg: KnowledgeGraph, hops: Int): DataFrame = {
    val t = kg.triples.select(
      col("subject"), col("predicate"), col("value").as("__lit"), col("valueNum").as("__num"), col("ref")
    )
    // frontier: (__fv = fact surface value, entity, path prefix)
    var frontier = linked.select(col("value").as("__fv"), col("entity"), lit("").as("path"))
    var acc: Option[DataFrame] = None
    var h = 0
    while (h < hops) {
      val joined = frontier.join(t, frontier("entity") === t("subject"))
      val literals = joined
        .where(col("ref").isNull)
        .select(
          col("__fv").as("value"),
          concat(col("path"), col("predicate")).as("attr"),
          col("__lit").as("v"),
          col("__num").as("vn")
        )
      acc = Some(acc.fold(literals)(_ unionByName literals))
      frontier =
        if (h + 1 < hops)
          joined
            .where(col("ref").isNotNull)
            .select(col("__fv"), col("ref").as("entity"), concat(col("path"), col("predicate"), lit("_")).as("path"))
        else frontier.limit(0)
      h += 1
    }
    acc.get
  }

  /** Extract an [[EntitySource]] for `facts(keyCol)` from the KG. */
  def extract(
      facts: DataFrame,
      keyCol: String,
      kg: KnowledgeGraph,
      hops: Int = 1,
      prefix: String = "",
      sourceId: String = ""
  ): EntitySource = {
    val values = facts.select(col(keyCol).cast("string").as("value")).where(col("value").isNotNull).distinct()
    val linked = EntityLinker.link(values, kg)
    val long   = propertiesLong(linked, kg, hops)
      .withColumn("attr", concat(lit(prefix), col("attr")))

    // Decide per attribute whether it is numeric: every present literal must
    // parse as a number.
    val kinds = long
      .groupBy("attr")
      .agg(sum(when(col("vn").isNull && col("v").isNotNull, 1).otherwise(0)).as("nonNum"))
      .collect()
      .map(r => sanitize(r.getString(0)) -> (r.getLong(1) == 0L))
      .toMap
    val sanitized   = long.withColumn("attr", regexp_replace(col("attr"), "[^A-Za-z0-9_]", "_"))
    val numericAttrs = kinds.collect { case (a, true) => a }.toSeq.sorted
    val stringAttrs  = kinds.collect { case (a, false) => a }.toSeq.sorted

    val numWide =
      if (numericAttrs.isEmpty) None
      else
        Some(
          sanitized
            .where(col("attr").isin(numericAttrs: _*))
            .groupBy("value")
            .pivot("attr", numericAttrs)
            .agg(avg(col("vn")))
        )
    val strWide =
      if (stringAttrs.isEmpty) None
      else
        Some(
          sanitized
            .where(col("attr").isin(stringAttrs: _*))
            .groupBy("value")
            .pivot("attr", stringAttrs)
            .agg(min(col("v")))
        )

    val wide0 = (numWide, strWide) match {
      case (Some(a), Some(b)) => a.join(b, Seq("value"), "outer")
      case (Some(a), None)    => a
      case (None, Some(b))    => b
      case (None, None)       => values.withColumnRenamed("value", "value")
    }
    // Universal relation: every distinct surface value gets a row, linked or
    // not. Entity tables are small; localCheckpoint truncates the wide pivot
    // lineage so downstream plans stay cheap to analyze.
    val wide = values.join(wide0, Seq("value"), "left").withColumnRenamed("value", keyCol)
      .localCheckpoint(true)
    val attrs = (numericAttrs ++ stringAttrs).sorted
    EntitySource(if (sourceId.nonEmpty) sourceId else s"kg:$keyCol", keyCol, wide, attrs)
  }
}
