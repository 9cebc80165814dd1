package repro.core

import org.apache.spark.sql.{Column, DataFrame}
import org.apache.spark.sql.functions._
import org.apache.spark.storage.StorageLevel

import repro.info.{Binning, InfoTheory}

/** Per-attribute statistics used by the online pruning phase (§4.2). */
final case class OnlineStats(
    relO: Double,  // I(E;O)        — low-relevance test, part 1
    relOT: Double, // I(E;O|T)      — low-relevance test, part 2
    miET: Double,  // I(E;T)        — association with the exposure (HypDB's confounder test)
    hTE: Double,   // H(T|E)        — approximate-FD test vs T
    hET: Double,   // H(E|T)
    hOE: Double,   // H(O|E)        — approximate-FD test vs O
    hEO: Double    // H(E|O)
)

/** The distributed-dataflow engine behind MESA.
  *
  * All statistics the MCIMR algorithm needs are expressed as DataFrame
  * aggregations over *contingency cells*:
  *
  *  1. the query-result side is reduced once per source to
  *     `groupBy(entityKey, T, bin(O)).count` — this is the only pass over the
  *     (potentially millions of) fact tuples;
  *  2. the external attribute sources are *melted* (`stack`) into a long
  *     (key, attr, bin, weight) form — entity tables are tiny, so a single
  *     join + aggregation scores every candidate attribute at once;
  *  3. entropies/CMIs are computed from the resulting cells by
  *     [[repro.info.InfoTheory]].
  *
  * IPW weights (§3.2) ride along as the `<attr>__w` columns of the entity
  * sources and multiply into the cell weights.
  *
  * Construct with the candidate set that survived offline pruning; MESA⁻
  * constructs it with the full set. Call [[close]] to release cached data.
  */
final class TaskEngine(val task: QueryTask, val candidates: Seq[Candidate], val cfg: MesaConfig) {

  import TaskEngine.{OCol, TCol}

  private val byName: Map[String, Candidate] = candidates.map(c => c.name -> c).toMap
  private val tableAttrNames: Seq[String]    = candidates.filter(_.isTableAttr).map(_.name)
  private val keyCols: Seq[String]           = task.sources.map(_.keyCol).distinct

  private val cached = scala.collection.mutable.ArrayBuffer.empty[DataFrame]
  private def cache(df: DataFrame): DataFrame = {
    val c = df.persist(StorageLevel.MEMORY_AND_DISK)
    cached.synchronized { cached += c }
    c
  }

  /** Fact rows reduced to what the statistics need: T as string, O binned,
    * binned in-table candidates, raw linking keys. Cached — every other
    * dataflow starts here.
    */
  lazy val factB: DataFrame = {
    val selectCols =
      col(task.t).cast("string").as(TCol) +:
        col(task.o).cast("double").as(OCol) +:
        (tableAttrNames ++ keyCols).distinct.map(col)
    val base = task.df.select(selectCols: _*).na.drop("any", Seq(TCol, OCol))
    cache(Binning.binColumns(base, OCol +: tableAttrNames, cfg.bins))
  }

  /** Binned copy of each entity source table (keys + weight columns kept raw). */
  private lazy val srcBinned: Map[String, DataFrame] =
    task.sources.map { s =>
      val attrs = s.attrs.filter(a => byName.contains(a))
      val df =
        if (attrs.isEmpty) s.table
        else Binning.binColumns(s.table, attrs, cfg.entityBins)
      s.id -> cache(df)
    }.toMap

  private def weightExprSql(table: DataFrame, attr: String): String =
    if (table.columns.contains(EntitySource.weightCol(attr)))
      s"CAST(coalesce(`${EntitySource.weightCol(attr)}`, 1.0D) AS DOUBLE)"
    else "CAST(1.0D AS DOUBLE)"

  /** Melted (key, attr, ebin, ew) view of one source, complete cases only. */
  private lazy val attrLong: Map[String, DataFrame] =
    task.sources.flatMap { s =>
      val attrs = s.attrs.filter(a => byName.contains(a))
      if (attrs.isEmpty) None
      else {
        val t = srcBinned(s.id)
        val triples =
          attrs.map(a => s"'$a', CAST(`$a` AS STRING), ${weightExprSql(t, a)}").mkString(", ")
        val melted = t
          .selectExpr(s"`${s.keyCol}`", s"stack(${attrs.size}, $triples) as (attr, ebin, ew)")
          .where(col("ebin").isNotNull && col(s.keyCol).isNotNull)
        Some(s.id -> cache(melted))
      }
    }.toMap

  /** Query-result side of the join: per-source (key, T, O-bin) counts. */
  private lazy val factKeyCounts: Map[String, DataFrame] =
    task.sources.map { s =>
      val g = factB
        .where(col(s.keyCol).isNotNull)
        .groupBy(col(s.keyCol), col(TCol), col(OCol))
        .agg(count(lit(1)).cast("double").as("__n"))
      s.id -> cache(g)
    }.toMap

  private def meltFact(df: DataFrame, attrs: Seq[String], extraCols: Seq[String], wSql: String): DataFrame = {
    val pairs = attrs.map(a => s"'$a', CAST(`$a` AS STRING)").mkString(", ")
    df.selectExpr(extraCols.map(c => s"`$c`") :+ s"stack(${attrs.size}, $pairs) as (attr, ebin)" :+ s"$wSql as ew": _*)
      .where(col("ebin").isNotNull)
  }

  /** Central per-candidate contingency: (attr, ebin, T, O-bin, weight).
    * One Spark job builds the statistics for every candidate attribute.
    */
  lazy val attrCells: DataFrame = {
    val fromSources = task.sources.flatMap { s =>
      attrLong.get(s.id).map { long =>
        long
          .join(factKeyCounts(s.id), s.keyCol)
          .groupBy(col("attr"), col("ebin"), col(TCol), col(OCol))
          .agg(sum(col("__n") * col("ew")).as(InfoTheory.W))
      }
    }
    val fromTable =
      if (tableAttrNames.isEmpty) Nil
      else
        Seq(
          meltFact(factB, tableAttrNames, Seq(TCol, OCol), "CAST(1.0D AS DOUBLE)")
            .groupBy(col("attr"), col("ebin"), col(TCol), col(OCol))
            .agg(sum(col("ew")).as(InfoTheory.W))
        )
    val all = (fromSources ++ fromTable).reduce(_ unionByName _)
    cache(all)
  }

  /** I(O;T|C) — the unexplained correlation the query exposes. */
  lazy val baseCmi: Double =
    InfoTheory.mi(InfoTheory.cells(factB, Seq(TCol, OCol)), Seq(TCol), Seq(OCol), mm = true)

  /** v1 of Alg. 1: I(O;T|C,E) for every candidate, one batched job. */
  lazy val cmiAll: Map[String, Double] =
    InfoTheory
      .cmiPerGroup(attrCells, "attr", Seq(TCol), Seq(OCol), Seq("ebin"), "v", mm = true)
      .collect()
      .map(r => r.getString(0) -> r.getDouble(1))
      .toMap

  /** I(O;T|C) restricted to each attribute's complete cases — the baseline
    * v1 must be compared against. Complete-case CMIs of attributes with very
    * different missingness are otherwise incomparable: a heavily-missing
    * attribute looks like a great explanation merely because its
    * subpopulation exposes less measurable correlation.
    */
  lazy val basePerAttr: Map[String, Double] =
    InfoTheory
      .miPerGroup(attrCells, "attr", Seq(TCol), Seq(OCol), "b", mm = true)
      .collect()
      .map(r => r.getString(0) -> r.getDouble(1))
      .toMap

  /** Effective explanation power, population-normalized:
    * baseCmi + (I(O;T|C,E) − I(O;T|C on E's rows)). Equal to plain v1 for
    * fully-present attributes. This is what selection/ranking uses.
    */
  lazy val effCmiAll: Map[String, Double] =
    cmiAll.map { case (a, v) =>
      a -> math.max(0.0, baseCmi + v - basePerAttr.getOrElse(a, baseCmi))
    }

  /** Pooled permutation floor: the null distribution of the *best* score an
    * arbitrary partition of the entity pool can reach.
    *
    * Any attribute over a modest entity pool "explains" part of the
    * entity-level outcome variation by construction; with hundreds of
    * candidates, the best of those artifacts can rival weak real signals,
    * and a per-candidate test cannot control that selection bias. Instead,
    * each round permutes entity identities (one shared shuffle per source —
    * each attribute's partition is still reassigned randomly), recomputes
    * every extracted candidate's population-normalized score in ONE batched
    * Spark job, and takes the minimum over candidates. A candidate is
    * eligible for selection only if it beats all `permRounds` round-minima,
    * i.e. p <= 1/(rounds+1) against the best-arbitrary-partition null.
    * In-table attributes (few, row-level) are exempt.
    */
  /** Number of linked entities (within the query context) on which each
    * extracted attribute is observed.
    */
  lazy val attrSupport: Map[String, Long] = {
    val parts = task.sources.flatMap { s =>
      attrLong.get(s.id).map { long =>
        val ctxKeys = factKeyCounts(s.id).select(col(s.keyCol)).distinct()
        long.join(ctxKeys, s.keyCol)
          .groupBy(col("attr"))
          .agg(countDistinct(col(s.keyCol)).as("n"))
      }
    }
    if (parts.isEmpty) Map.empty
    else parts.reduce(_ unionByName _).collect().map(r => r.getString(0) -> r.getLong(1)).toMap
  }

  /** Entities of each source present in the query context. */
  lazy val contextEntities: Map[String, Long] =
    task.sources.map(s => s.id -> factKeyCounts(s.id).select(col(s.keyCol)).distinct().count()).toMap

  /** Extracted attributes with enough entity support to be estimable: at
    * least min(cfg.minEntitySupport, 90% of the context's entity pool).
    * Artifact strength scales with levels/support, so patchy attributes on
    * small pools are statistically meaningless.
    */
  def hasSupport(c: Candidate): Boolean = c.sourceId match {
    case None => true
    case Some(sid) =>
      val pool = contextEntities.getOrElse(sid, 0L)
      val threshold = math.min(cfg.minEntitySupport.toLong, math.ceil(pool * 0.9).toLong)
      attrSupport.getOrElse(c.name, 0L) >= threshold
  }

  /** (per-attribute permutation mean/sd of eff, per-source studentized floor). */
  lazy val permutationStats: (Map[String, (Double, Double)], Map[String, Double]) = computePermutationStats()

  private def computePermutationStats(): (Map[String, (Double, Double)], Map[String, Double]) = {
    if (!cfg.permGuard) return (Map.empty, Map.empty)
    val rnd = new scala.util.Random(20230143L)
    val attrToSource = candidates.flatMap(c => c.sourceId.map(sid => c.name -> sid)).toMap
    // Only decently-supported attributes form the null pool: a near-empty
    // attribute's degenerate artifact would poison the floor for everyone.
    val supported = candidates.filter(c => !c.isTableAttr && hasSupport(c)).map(_.name)
    if (supported.isEmpty) return (Map.empty, Map.empty)
    val perSource: Seq[DataFrame] = task.sources.flatMap { s =>
      attrLong.get(s.id).map(_.where(col("attr").isin(supported: _*))).map { long =>
        // Permute within the keys present in the query context: the null
        // must preserve each attribute's in-context support (shuffling over
        // the full entity universe would scatter values outside the context
        // and fabricate degenerate tiny-pool artifacts).
        val keys = factKeyCounts(s.id)
          .select(col(s.keyCol).cast("string")).na.drop().distinct()
          .collect().map(_.getString(0)).sorted.toIndexedSeq
        val permRows = (0 until cfg.permRounds).flatMap { r =>
          val shuffled = rnd.shuffle(keys)
          keys.indices.map(i => (r, keys(i), shuffled(i)))
        }
        import org.apache.spark.sql.Row
        import org.apache.spark.sql.types._
        val schema = StructType(Seq(
          StructField("__round", IntegerType), StructField("__k", StringType), StructField("__pk", StringType)))
        val permDf = task.df.sparkSession.createDataFrame(
          task.df.sparkSession.sparkContext.parallelize(permRows.map(Row.fromTuple), 1), schema)
        long
          .join(permDf, col(s.keyCol).cast("string") === col("__k"))
          .select(col("__round"), col("__pk").as("__key"), col("attr"), col("ebin"), col("ew"))
          .join(factKeyCounts(s.id).withColumnRenamed(s.keyCol, "__key"), "__key")
          .groupBy(col("__round"), col("attr"), col("ebin"), col(TCol), col(OCol))
          .agg(sum(col("__n") * col("ew")).as(InfoTheory.W))
      }
    }
    if (perSource.isEmpty) return (Map.empty, Map.empty)
    val cells = perSource.reduce(_ unionByName _)
      .withColumn("__g", concat_ws("\u00a7", col("__round"), col("attr")))
    val v1 = InfoTheory.cmiPerGroup(cells, "__g", Seq(TCol), Seq(OCol), Seq("ebin"), "v", mm = true)
    val b  = InfoTheory.miPerGroup(cells, "__g", Seq(TCol), Seq(OCol), "b", mm = true)
    val rows = v1.join(b, "__g")
      .select(col("__g"), greatest(lit(0.0), lit(baseCmi) + col("v") - col("b")).as("eff"))
      .collect()
      .flatMap { r =>
        val Array(round, attr) = r.getString(0).split('\u00a7')
        if (attrToSource.contains(attr)) Some((attr, round.toInt, r.getDouble(1))) else None
      }
    // Studentized max-T: each attribute's scores are standardized by its OWN
    // permutation distribution (so attributes of different support/level
    // structure become comparable), then per source take the min over
    // attributes within each round and the min over rounds.
    val byAttr = rows.groupBy(_._1)
    val stats: Map[String, (Double, Double)] = byAttr.map { case (a, rs) =>
      val vs   = rs.map(_._3)
      val mean = vs.sum / vs.size
      val sd   = math.sqrt(vs.map(v => (v - mean) * (v - mean)).sum / math.max(vs.size - 1, 1))
      a -> (mean, math.max(sd, 1e-3))
    }
    val zRows = rows.map { case (a, r, v) =>
      val (m, sd) = stats(a)
      (attrToSource(a), r, (v - m) / sd)
    }
    val floors = zRows.groupBy(_._1).map { case (sid, rs) =>
      val roundMins = rs.groupBy(_._2).values.map(_.map(_._3).min)
      sid -> roundMins.min
    }
    (stats, floors)
  }

  /** Whether a candidate beats the best-arbitrary-partition null of its own
    * source's entity pool (studentized max-T). In-table attributes exempt.
    */
  def passesPermutationFloor(c: Candidate): Boolean = c.sourceId match {
    case None => true
    case Some(sid) =>
      val (stats, floors) = permutationStats
      val floor = floors.getOrElse(sid, Double.PositiveInfinity)
      hasSupport(c) && effCmiAll.get(c.name).exists { eff =>
        stats.get(c.name) match {
          case Some((m, sd)) => (eff - m) / sd < floor
          case None          => false
        }
      }
  }

  /** Back-compat view for diagnostics: the per-source z floors. */
  def permutationFloors: Map[String, Double] = permutationStats._2

  /** Statistics for the online pruning tests (§4.2), batched per attribute. */
  lazy val onlineStats: Map[String, OnlineStats] = {
    val relO  = InfoTheory.miPerGroup(attrCells, "attr", Seq("ebin"), Seq(OCol), "relO", mm = true)
    val relOT = InfoTheory.cmiPerGroup(attrCells, "attr", Seq("ebin"), Seq(OCol), Seq(TCol), "relOT", mm = true)
    val hE    = InfoTheory.entropyPerGroup(attrCells, "attr", Seq("ebin"), "hE")
    val hT    = InfoTheory.entropyPerGroup(attrCells, "attr", Seq(TCol), "hT")
    val hO    = InfoTheory.entropyPerGroup(attrCells, "attr", Seq(OCol), "hO")
    val hET   = InfoTheory.entropyPerGroup(attrCells, "attr", Seq("ebin", TCol), "hETj")
    val hEO   = InfoTheory.entropyPerGroup(attrCells, "attr", Seq("ebin", OCol), "hEOj")
    relO
      .join(relOT, "attr").join(hE, "attr").join(hT, "attr").join(hO, "attr")
      .join(hET, "attr").join(hEO, "attr")
      .collect()
      .map { r =>
        val m = r.getValuesMap[Double](Seq("relO", "relOT", "hE", "hT", "hO", "hETj", "hEOj"))
        r.getString(0) -> OnlineStats(
          relO = m("relO"),
          relOT = m("relOT"),
          miET = math.max(0.0, m("hE") + m("hT") - m("hETj")),
          hTE = math.max(0.0, m("hETj") - m("hE")),
          hET = math.max(0.0, m("hETj") - m("hT")),
          hOE = math.max(0.0, m("hEOj") - m("hE")),
          hEO = math.max(0.0, m("hEOj") - m("hO"))
        )
      }
      .toMap
  }

  /** factB with the selected attribute's bin (`__sel`) and weight (`__selw`). */
  private def withSel(sel: Candidate): DataFrame = sel.sourceId match {
    case None =>
      factB.withColumn("__sel", col(sel.name)).withColumn("__selw", lit(1.0))
    case Some(sid) =>
      val s = task.sourceById(sid)
      val t = srcBinned(sid)
      val sw = expr(weightExprSql(t, sel.name))
      factB.join(
        t.select(col(s.keyCol), col(sel.name).cast("string").as("__sel"), sw.as("__selw")),
        Seq(s.keyCol),
        "left"
      )
  }

  /** v2 of Alg. 1: I(E; sel) for every remaining candidate, one batched job
    * per newly-selected attribute (so k jobs total across the MCIMR run).
    */
  def miAllVs(sel: Candidate): Map[String, Double] = {
    val fs = withSel(sel).where(col("__sel").isNotNull)
    val fromSources = task.sources.flatMap { s =>
      attrLong.get(s.id).map { long =>
        val pairCounts = fs
          .where(col(s.keyCol).isNotNull)
          .groupBy(col(s.keyCol), col("__sel"))
          .agg(sum(col("__selw")).as("__n"))
        long
          .join(pairCounts, s.keyCol)
          .groupBy(col("attr"), col("ebin"), col("__sel"))
          .agg(sum(col("__n") * col("ew")).as(InfoTheory.W))
      }
    }
    val fromTable =
      if (tableAttrNames.isEmpty) Nil
      else
        Seq(
          meltFact(fs, tableAttrNames, Seq("__sel"), "CAST(`__selw` AS DOUBLE)")
            .groupBy(col("attr"), col("ebin"), col("__sel"))
            .agg(sum(col("ew")).as(InfoTheory.W))
        )
    val all = (fromSources ++ fromTable).reduce(_ unionByName _)
    InfoTheory
      .miPerGroup(all, "attr", Seq("ebin"), Seq("__sel"), "mi", mm = true)
      .collect()
      .map(r => r.getString(0) -> r.getDouble(1))
      .toMap
  }

  /** factB with the given attributes' bin columns joined in and a combined
    * per-row weight `__wt` (product of the attributes' IPW weights).
    */
  def joinedWith(attrs: Seq[Candidate]): DataFrame = {
    val bySource = attrs.filterNot(_.isTableAttr).groupBy(_.sourceId.get)
    var df = factB.withColumn("__wt", lit(1.0))
    for ((sid, as) <- bySource) {
      val s = task.sourceById(sid)
      val t = srcBinned(sid)
      val wProd = as.map(a => expr(weightExprSql(t, a.name))).reduce(_ * _)
      val proj  = t.select(col(s.keyCol) +: as.map(a => col(a.name).cast("string").as(a.name)) :+ wProd.as(s"__w_$sid"): _*)
      df = df.join(proj, Seq(s.keyCol), "left").withColumn("__wt", col("__wt") * coalesce(col(s"__w_$sid"), lit(1.0)))
    }
    df
  }

  /** I(O;T|C,E) for an arbitrary attribute set E (Def. 2.1 objective). */
  def cmiSet(attrs: Seq[Candidate]): Double = cmiSetWhere(attrs, lit(true))

  /** Same, on the context refinement `cond` (Alg. 2's explanation score). */
  def cmiSetWhere(attrs: Seq[Candidate], cond: Column): Double = {
    val names = attrs.map(_.name)
    val base  = joinedWith(attrs).where(cond)
    val cs    = InfoTheory.cells(base, Seq(TCol, OCol) ++ names, Some("__wt"))
    InfoTheory.cmi(cs, Seq(TCol), Seq(OCol), names, mm = true)
  }

  /** I(O; e | given) — the responsibility / stopping test of Lemma 4.2. */
  def cmiOGiven(e: Candidate, given: Seq[Candidate]): Double = {
    val base = joinedWith(e +: given)
    val cs   = InfoTheory.cells(base, OCol +: (e +: given).map(_.name), Some("__wt"))
    InfoTheory.cmi(cs, Seq(e.name), Seq(OCol), given.map(_.name), mm = true)
  }

  /** G-test version of the responsibility test (Lemma 4.2): true when
    * O ⊥ e | given cannot be rejected. Spark reduces to cells; the test
    * itself runs locally on the (tiny) collected cells.
    */
  def indepOGiven(e: Candidate, given: Seq[Candidate], alpha: Double = 0.05): Boolean = {
    val cols  = (e +: given).map(_.name) :+ OCol
    val base  = joinedWith(e +: given)
    val cs    = InfoTheory.cells(base, cols, Some("__wt"))
    val local: repro.info.LocalInfo.Cells = cs.collect().toIndexedSeq.map { r =>
      (IndexedSeq.tabulate(cols.size)(i => String.valueOf(r.get(i))), r.getDouble(cols.size))
    }
    val eIdx = Seq(0)
    val oIdx = Seq(cols.size - 1)
    val zIdx = given.indices.map(_ + 1)
    repro.info.LocalInfo.gTestIndependent(local, eIdx, oIdx, zIdx, alpha)
  }

  def candidate(name: String): Candidate =
    byName.getOrElse(name, sys.error(s"unknown candidate $name"))

  def close(): Unit = cached.synchronized {
    cached.foreach(_.unpersist(blocking = false))
    cached.clear()
  }
}

object TaskEngine {
  /** Reserved internal column names. */
  val TCol = "__t"
  val OCol = "__o"
}
