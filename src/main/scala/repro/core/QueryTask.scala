package repro.core

import org.apache.spark.sql.DataFrame

/** A candidate confounding attribute (§2.2): either a column of the input
  * table D, or an attribute extracted from an external source (§3.1).
  */
final case class Candidate(name: String, sourceId: Option[String]) {
  def isTableAttr: Boolean = sourceId.isEmpty
  override def toString: String = sourceId.fold(name)(s => s"$name@$s")
}

/** An external attribute source already materialized as an entity-level
  * table: one row per distinct value of the fact-side linking column
  * `keyCol` (including unlinked values, whose attributes are all null),
  * one column per extracted attribute.
  *
  * A column named `<attr>__w` (see [[EntitySource.weightCol]]) carries the
  * inverse-probability weights of `<attr>`'s complete cases when selection
  * bias was detected (§3.2); absent means weight 1.
  */
final case class EntitySource(id: String, keyCol: String, table: DataFrame, attrs: Seq[String]) {
  require(attrs.forall(table.columns.contains), s"source $id: attrs missing from table")
  require(table.columns.contains(keyCol), s"source $id: keyCol $keyCol missing")
}

object EntitySource {
  /** Name of the IPW weight column that accompanies attribute `attr`. */
  def weightCol(attr: String): String = attr + "__w"
}

/** The aggregate-query explanation task (§2.1): the input table already
  * filtered by the context C, the exposure T (a categorical column; composite
  * group-bys are pre-concatenated), the numeric outcome O, the in-table
  * candidate attributes, and the external attribute sources.
  */
final case class QueryTask(
    name: String,
    df: DataFrame,
    t: String,
    o: String,
    tableAttrs: Seq[String],
    sources: Seq[EntitySource],
    contextDesc: String = ""
) {
  /** All candidate attributes A = E ∪ T \ {O, T}. */
  def candidates: Seq[Candidate] =
    tableAttrs.map(Candidate(_, None)) ++
      sources.flatMap(s => s.attrs.map(Candidate(_, Some(s.id))))

  def sourceById(id: String): EntitySource =
    sources.find(_.id == id).getOrElse(sys.error(s"unknown source $id"))

  {
    val names = candidates.map(_.name)
    require(names.distinct.size == names.size, s"duplicate candidate attribute names in task $name")
    val bad = names.filterNot(_.matches("[A-Za-z0-9_]+"))
    require(bad.isEmpty, s"attribute names must be [A-Za-z0-9_]+, offending: ${bad.take(5)}")
  }
}

/** Tuning knobs of MESA; defaults follow the paper's setup (k = 5, binned
  * numeric attributes, both pruning phases and IPW enabled). Thresholds are
  * in bits, matching [[repro.info.InfoTheory]].
  */
final case class MesaConfig(
    k: Int = 5,
    bins: Int = 6,
    /** Responsibility-test threshold: stop when I(O; E_new | E_sel) <= this. */
    epsResp: Double = 0.03,
    /** Approximate-FD threshold: drop E when H(T|E) and H(E|T) are both below. */
    epsFd: Double = 0.05,
    /** Low-relevance threshold: drop E when I(E;O) and I(E;O|T) are both below. */
    epsRel: Double = 0.01,
    /** Offline: drop attributes missing in more than this fraction of entities. */
    maxMissingFrac: Double = 0.9,
    /** Offline: drop near-ID attributes (distinct/non-null above this and
      * at least `idMinDistinct` distinct values). */
    idDistinctFrac: Double = 0.95,
    idMinDistinct: Int = 20,
    pruneOffline: Boolean = true,
    pruneOnline: Boolean = true,
    ipw: Boolean = true,
    /** MI(R_E; feature) threshold above which missingness counts as biased. */
    ipwBiasEps: Double = 0.02,
    /** IPW weights are clipped to [1/clip, clip] for stability. */
    ipwWeightClip: Double = 10.0,
    /** Extracted attributes observed on fewer linked entities than this
      * (within the query context) are statistically meaningless — their tiny
      * complete-case pool is trivially "explained" by any partition.
      */
    minEntitySupport: Int = 40,
    /** Pooled permutation guard (see TaskEngine.permutationFloors). */
    permGuard: Boolean = true,
    permRounds: Int = 19,
    /** Bins for *extracted entity* attributes: slightly coarser than the
      * outcome/table bins — partition artifacts over small entity pools grow
      * with the number of levels.
      */
    entityBins: Int = 5
)
