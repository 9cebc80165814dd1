package repro.data

import org.apache.spark.sql.DataFrame

import repro.core.EntitySource
import repro.kg.{AttributeExtractor, KnowledgeGraph}

/** A fact-table column from which KG attributes are extracted (Table 1's
  * "columns used for extraction"), together with the prefix applied to the
  * extracted attribute names (so e.g. origin- and destination-city sources
  * stay distinct) and the source id.
  */
final case class LinkSpec(factCol: String, prefix: String, sourceId: String)

/** One of the paper's four evaluation datasets, rebuilt synthetically:
  * the fact table, the knowledge graph the attributes are mined from, and
  * the linking columns. `designRows` is the paper's row count at SF = 1.
  */
final case class DatasetBundle(
    name: String,
    facts: DataFrame,
    kg: KnowledgeGraph,
    links: Seq[LinkSpec],
    designRows: Long
) {
  /** Run the extraction pipeline (§3.1) for every linking column. */
  def sources(hops: Int = 1): Seq[EntitySource] =
    links.map(l => AttributeExtractor.extract(facts, l.factCol, kg, hops, l.prefix, l.sourceId))
}
