package repro.kg

import org.apache.spark.sql.DataFrame

/** A knowledge graph as a triple store (the DBpedia substitute of §3.1).
  *
  * `triples` columns:
  *  - `subject`   — entity id
  *  - `predicate` — property name
  *  - `value`     — literal value as a string (null when the object is an
  *                  entity reference)
  *  - `valueNum`  — the literal parsed as double when the property is
  *                  numeric, else null
  *  - `ref`       — the referenced entity id when the object is another
  *                  entity (enables multi-hop extraction), else null
  *
  * `labels` columns: (`entity`, `label`) — canonical names plus aliases, the
  * lookup table for the entity linker. Ambiguous surface forms ("Ronaldo")
  * appear as the label of several entities.
  */
final case class KnowledgeGraph(triples: DataFrame, labels: DataFrame) {
  require(
    Seq("subject", "predicate", "value", "valueNum", "ref").forall(triples.columns.contains),
    "triples must have columns subject/predicate/value/valueNum/ref"
  )
  require(
    Seq("entity", "label").forall(labels.columns.contains),
    "labels must have columns entity/label"
  )
}
