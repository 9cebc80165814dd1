package repro.kg

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** Named-entity disambiguation (NED) substitute (§3.1).
  *
  * Maps surface values from the input table to KG entities by normalized
  * label/alias lookup. Mirrors the behaviour of an off-the-shelf linker as
  * discussed in the paper's appendix:
  *  - values that match no label stay unlinked ("Russian Federation" with no
  *    alias registered) — their extracted attributes are all missing;
  *  - values whose normalized form matches labels of *several* entities are
  *    ambiguous ("Ronaldo") and stay unlinked as well.
  */
object EntityLinker {

  /** Lowercase, trim, collapse whitespace and strip punctuation. */
  def normalize(c: org.apache.spark.sql.Column): org.apache.spark.sql.Column =
    trim(regexp_replace(regexp_replace(lower(c), "[^a-z0-9 ]", " "), " +", " "))

  /** Link distinct surface values to entities.
    *
    * @param values single-column DataFrame named `value`
    * @return (value, entity) — only unambiguous matches
    */
  def link(values: DataFrame, kg: KnowledgeGraph): DataFrame = {
    val v = values.select(col("value")).where(col("value").isNotNull).distinct()
      .withColumn("__norm", normalize(col("value")))
    val l = kg.labels
      .select(col("entity"), normalize(col("label")).as("__norm"))
      .distinct()
    v.join(l, "__norm")
      .groupBy(col("value"))
      .agg(countDistinct(col("entity")).as("__n"), first(col("entity")).as("entity"))
      .where(col("__n") === 1)
      .select(col("value"), col("entity"))
  }
}
