package repro.baselines

import org.apache.spark.sql.{Column, DataFrame}
import org.apache.spark.sql.functions._

import repro.core.{Candidate, EntitySource, QueryTask}
import repro.info.Binning
import repro.missing.LogisticRegression

/** The Linear-Regression baseline (§5): OLS of the outcome on the numeric
  * candidate attributes; the explanation is the top-k attributes with the
  * largest standardized coefficients among those with p-value < .05. It may
  * return an empty explanation when nothing is significant — exactly the
  * failure mode the paper reports.
  *
  * Two-stage dataflow: (1) a batched univariate-Pearson pass (the melt-join-
  * aggregate pattern, one Spark job for all candidates) shortlists the
  * `poolCap` most linearly-correlated attributes; (2) the normal equations
  * ZᵀZ, Zᵀy for the shortlist are accumulated in one aggregation and solved
  * on the driver with a small ridge for stability.
  */
object OlsExplainer {

  final case class Fit(picked: Seq[Candidate], coefs: Map[String, Double], pvals: Map[String, Double])

  private def phi(t: Double): Double = { // standard normal CDF via erf approximation
    val z = t / math.sqrt(2.0)
    val a = math.abs(z)
    val e = 1.0 - 1.0 / math.pow(1.0 + a * (0.278393 + a * (0.230389 + a * (0.000972 + a * 0.078108))), 4)
    0.5 * (1.0 + (if (z >= 0) e else -e))
  }

  private[baselines] def pValue(t: Double): Double = 2.0 * (1.0 - phi(math.abs(t)))

  /** Batched |Pearson r| between O and every numeric candidate. */
  private[baselines] def pearsonAll(task: QueryTask, active: Seq[Candidate]): Map[String, Double] = {
    val activeNames = active.map(_.name).toSet
    val o           = col(task.o).cast("double")

    def finish(df: DataFrame): Seq[(String, Double)] =
      df.groupBy("attr")
        .agg(
          sum(col("n")).as("N"),
          sum(col("v") * col("n")).as("SE"),
          sum(col("v") * col("v") * col("n")).as("SEE"),
          sum(col("so")).as("SO"),
          sum(col("soo")).as("SOO"),
          sum(col("v") * col("so")).as("SEO")
        )
        .collect()
        .toSeq
        .flatMap { r =>
          val Seq(n, se, see, so, soo, seo) = (1 to 6).map(r.getDouble)
          val den = (n * see - se * se) * (n * soo - so * so)
          if (den <= 0 || n < 3) None
          else Some(r.getString(0) -> (n * seo - se * so) / math.sqrt(den))
        }

    val fromSources = task.sources.flatMap { s =>
      val numeric = s.attrs.filter(a => activeNames.contains(a) && Binning.isNumeric(s.table.schema(a).dataType))
      if (numeric.isEmpty) Nil
      else {
        val factAgg = task.df
          .where(col(s.keyCol).isNotNull && o.isNotNull)
          .groupBy(col(s.keyCol))
          .agg(count(lit(1)).cast("double").as("n"), sum(o).as("so"), sum(o * o).as("soo"))
        val pairs = numeric.map(a => s"'$a', CAST(`$a` AS DOUBLE)").mkString(", ")
        val long = s.table
          .selectExpr(s"`${s.keyCol}`", s"stack(${numeric.size}, $pairs) as (attr, v)")
          .where(col("v").isNotNull && !isnan(col("v")))
        finish(long.join(factAgg, s.keyCol))
      }
    }

    val tableNumeric = task.tableAttrs.filter(a => activeNames.contains(a) && Binning.isNumeric(task.df.schema(a).dataType))
    val fromTable =
      if (tableNumeric.isEmpty) Nil
      else {
        val pairs = tableNumeric.map(a => s"'$a', CAST(`$a` AS DOUBLE)").mkString(", ")
        val long = task.df
          .where(o.isNotNull)
          .select(o.as("__y"), expr(s"stack(${tableNumeric.size}, $pairs)").as("st"))
          .select(col("__y"), col("st.attr").as("attr"), col("st.v").as("v"))
          .where(col("v").isNotNull && !isnan(col("v")))
          .select(
            col("attr"), col("v"), lit(1.0).as("n"), col("__y").as("so"), (col("__y") * col("__y")).as("soo")
          )
        finish(long)
      }

    (fromSources ++ fromTable).toMap
  }

  /** Raw (unbinned) fact frame with the shortlisted attributes joined in. */
  private def rawJoined(task: QueryTask, picked: Seq[Candidate]): DataFrame = {
    val bySource = picked.filterNot(_.isTableAttr).groupBy(_.sourceId.get)
    var df = task.df
    for ((sid, as) <- bySource) {
      val s    = task.sources.find(_.id == sid).get
      val proj = s.table.select(col(s.keyCol) +: as.map(a => col(a.name).cast("double").as(a.name)): _*)
      df = df.join(proj, Seq(s.keyCol), "left")
    }
    df
  }

  def fit(task: QueryTask, active: Seq[Candidate], k: Int, poolCap: Int = 25, ridge: Double = 1e-6): Fit = {
    val rs = pearsonAll(task, active)
    val pool = active
      .filter(c => rs.contains(c.name))
      .sortBy(c => (-math.abs(rs(c.name)), c.name))
      .take(poolCap)
    if (pool.isEmpty) return Fit(Nil, Map.empty, Map.empty)

    val names = pool.map(_.name)
    val p     = names.size
    val df    = rawJoined(task, pool).where(col(task.o).isNotNull)
    val y     = col(task.o).cast("double")

    val statAggs = names.flatMap(a =>
      Seq(avg(col(a)).as(s"m_$a"), stddev_pop(col(a)).as(s"s_$a"))
    ) ++ Seq(avg(y).as("my"), count(lit(1)).cast("double").as("n"))
    val st    = df.agg(statAggs.head, statAggs.tail: _*).head()
    val means = Array.tabulate(p)(j => if (st.isNullAt(2 * j)) 0.0 else st.getDouble(2 * j))
    val stds  = Array.tabulate(p)(j => if (st.isNullAt(2 * j + 1)) 0.0 else st.getDouble(2 * j + 1))
    val my    = st.getDouble(2 * p)
    val n     = st.getDouble(2 * p + 1)
    if (n < p + 2) return Fit(Nil, Map.empty, Map.empty)

    // Mean-imputed standardized features (imputed value = 0 after centering).
    val z: Array[Column] = Array.tabulate(p) { j =>
      if (stds(j) > 0) (coalesce(col(names(j)).cast("double"), lit(means(j))) - lit(means(j))) / lit(stds(j))
      else lit(0.0)
    }
    val yc = y - lit(my)

    val aggs = (for { j <- 0 until p; l <- j until p } yield sum(z(j) * z(l)).as(s"x_${j}_$l")) ++
      (0 until p).map(j => sum(z(j) * yc).as(s"xy_$j")) :+ sum(yc * yc).as("yy")
    val row = df.agg(aggs.head, aggs.tail: _*).head()

    val ztz = Array.ofDim[Double](p, p)
    var idx = 0
    for (j <- 0 until p; l <- j until p) {
      val v = if (row.isNullAt(idx)) 0.0 else row.getDouble(idx)
      ztz(j)(l) = v; ztz(l)(j) = v; idx += 1
    }
    val zty = Array.tabulate(p)(j => if (row.isNullAt(idx + j)) 0.0 else row.getDouble(idx + j))
    val syy = row.getDouble(idx + p)

    val a = Array.tabulate(p, p)((j, l) => ztz(j)(l) + (if (j == l) ridge * n else 0.0))
    val w = LogisticRegression.solve(a, zty)

    val dof   = math.max(n - p - 1, 1.0)
    val sigma2 = math.max((syy - (0 until p).map(j => w(j) * zty(j)).sum) / dof, 1e-12)
    val pvals = (0 until p).map { j =>
      val ej = Array.tabulate(p)(l => if (l == j) 1.0 else 0.0)
      val invCol = LogisticRegression.solve(Array.tabulate(p, p)((x, yv) => a(x)(yv)), ej)
      val se = math.sqrt(math.max(sigma2 * invCol(j), 1e-300))
      names(j) -> pValue(w(j) / se)
    }.toMap

    val significant = pool
      .filter(c => pvals(c.name) < 0.05)
      .sortBy(c => (-math.abs(w(names.indexOf(c.name))), c.name))
      .take(k)
    Fit(significant, names.zip(w).toMap, pvals)
  }

  /** Explanation-shaped wrapper (finalCmi evaluated with the engine by the
    * harness; here we only choose the attribute set).
    */
  def explain(task: QueryTask, active: Seq[Candidate], k: Int): Seq[Candidate] =
    fit(task, active, k).picked
}
