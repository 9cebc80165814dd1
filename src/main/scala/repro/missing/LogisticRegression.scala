package repro.missing

import org.apache.spark.sql.{Column, DataFrame}
import org.apache.spark.sql.functions._

/** A fitted logistic-regression model P(y=1|x) = sigmoid(b0 + sum b_j z_j)
  * over standardized features z_j = (x_j - mean_j)/std_j.
  */
final case class LogitModel(
    features: Seq[String],
    means: Array[Double],
    stds: Array[Double],
    intercept: Double,
    weights: Array[Double]
) {
  private def margin(x: Array[Double]): Double = {
    var m = intercept
    var j = 0
    while (j < weights.length) {
      val z = if (stds(j) > 0) (x(j) - means(j)) / stds(j) else 0.0
      m += weights(j) * z
      j += 1
    }
    m
  }

  def predict(x: Array[Double]): Double = 1.0 / (1.0 + math.exp(-margin(x)))

  /** Catalyst expression computing P(y=1|x) from the feature columns. */
  def predictExpr: Column = {
    val m = features.zipWithIndex.foldLeft(lit(intercept)) { case (acc, (f, j)) =>
      if (stds(j) > 0) acc + lit(weights(j)) * ((col(f).cast("double") - lit(means(j))) / lit(stds(j)))
      else acc
    }
    lit(1.0) / (lit(1.0) + exp(-m))
  }
}

/** Logistic regression used to estimate the missingness model P(R_E=1|X) of
  * the IPW correction (§3.2).
  *
  * Two code paths share the same math:
  *  - [[LogisticRegression.fitLocal]]: IRLS (Newton) on a driver-side matrix.
  *    Entity tables are tiny by construction (one row per linked entity), so
  *    MESA's weight fitting uses this path.
  *  - [[LogisticRegression.fit]]: batch gradient descent where each step is a
  *    single DataFrame aggregation — for fact-level (millions of rows)
  *    missingness models.
  */
object LogisticRegression {

  private def sigmoid(m: Double): Double = 1.0 / (1.0 + math.exp(-m))

  /** Solve the symmetric linear system A x = b by Gaussian elimination with
    * partial pivoting (dims are tiny: #features + 1).
    */
  private[repro] def solve(a: Array[Array[Double]], b: Array[Double]): Array[Double] = {
    val n = b.length
    val m = Array.tabulate(n, n + 1)((i, j) => if (j < n) a(i)(j) else b(i))
    for (c <- 0 until n) {
      val p = (c until n).maxBy(r => math.abs(m(r)(c)))
      val tmp = m(c); m(c) = m(p); m(p) = tmp
      val piv = m(c)(c)
      require(math.abs(piv) > 1e-12, "singular system in logistic IRLS")
      for (r <- 0 until n if r != c) {
        val f = m(r)(c) / piv
        for (j <- c to n) m(r)(j) -= f * m(c)(j)
      }
    }
    Array.tabulate(n)(i => m(i)(n) / m(i)(i))
  }

  private def standardize(x: Array[Array[Double]]): (Array[Double], Array[Double], Array[Array[Double]]) = {
    val n = x.length
    val p = if (n == 0) 0 else x(0).length
    val means = Array.tabulate(p)(j => x.iterator.map(_(j)).sum / n)
    val stds = Array.tabulate(p) { j =>
      val v = x.iterator.map(r => { val d = r(j) - means(j); d * d }).sum / n
      math.sqrt(v)
    }
    val z = x.map(r => Array.tabulate(p)(j => if (stds(j) > 0) (r(j) - means(j)) / stds(j) else 0.0))
    (means, stds, z)
  }

  /** IRLS fit on driver-side data. `x(i)` is the raw feature row, `y(i)` in
    * {0,1}. Ridge `l2` keeps the Hessian invertible under separation.
    */
  def fitLocal(
      featureNames: Seq[String],
      x: Array[Array[Double]],
      y: Array[Double],
      l2: Double = 1e-3,
      iters: Int = 25
  ): LogitModel = {
    require(x.length == y.length && x.nonEmpty, "fitLocal: bad shapes")
    val p = featureNames.size
    require(x(0).length == p, "fitLocal: feature arity mismatch")
    val (means, stds, z) = standardize(x)
    val d = p + 1 // intercept first
    val w = new Array[Double](d)
    var it = 0
    while (it < iters) {
      val grad = new Array[Double](d)
      val hess = Array.ofDim[Double](d, d)
      var i = 0
      while (i < z.length) {
        var m = w(0)
        var j = 0
        while (j < p) { m += w(j + 1) * z(i)(j); j += 1 }
        val pr  = sigmoid(m)
        val err = pr - y(i)
        val s   = math.max(pr * (1 - pr), 1e-6)
        grad(0) += err
        j = 0
        while (j < p) { grad(j + 1) += err * z(i)(j); j += 1 }
        // Hessian contribution s * u uᵀ with u = (1, z_i)
        hess(0)(0) += s
        j = 0
        while (j < p) {
          hess(0)(j + 1) += s * z(i)(j)
          hess(j + 1)(0) += s * z(i)(j)
          var l = 0
          while (l < p) { hess(j + 1)(l + 1) += s * z(i)(j) * z(i)(l); l += 1 }
          j += 1
        }
        i += 1
      }
      var j = 1
      while (j < d) { grad(j) += l2 * w(j); hess(j)(j) += l2; j += 1 }
      hess(0)(0) += 1e-9
      val step = solve(hess, grad)
      var maxStep = 0.0
      j = 0
      while (j < d) { w(j) -= step(j); maxStep = math.max(maxStep, math.abs(step(j))); j += 1 }
      it += 1
      if (maxStep < 1e-8) it = iters
    }
    LogitModel(featureNames, means, stds, w(0), w.drop(1))
  }

  /** Distributed batch gradient descent: each step is one aggregation over
    * the DataFrame (no per-row driver work). Features are standardized from
    * a first aggregation pass. Label column must be 0/1.
    */
  def fit(
      df: DataFrame,
      labelCol: String,
      featureCols: Seq[String],
      iters: Int = 80,
      stepSize: Double = 1.0,
      l2: Double = 1e-4
  ): LogitModel = {
    require(featureCols.nonEmpty, "fit: no features")
    val p = featureCols.size
    val statAggs = featureCols.flatMap(f =>
      Seq(avg(col(f).cast("double")).as(s"m_$f"), stddev_pop(col(f).cast("double")).as(s"s_$f"))
    ) :+ count(lit(1)).cast("double").as("n")
    val stats = df.agg(statAggs.head, statAggs.tail: _*).head()
    val means = Array.tabulate(p)(j => stats.getDouble(2 * j))
    val stds  = Array.tabulate(p)(j => stats.getDouble(2 * j + 1))
    val n     = stats.getDouble(2 * p)
    require(n > 0, "fit: empty input")

    val zCols: Seq[Column] = featureCols.zipWithIndex.map { case (f, j) =>
      if (stds(j) > 0) (col(f).cast("double") - lit(means(j))) / lit(stds(j)) else lit(0.0)
    }
    val y = col(labelCol).cast("double")

    val w = new Array[Double](p + 1)
    var it = 0
    while (it < iters) {
      val marginCol = zCols.zipWithIndex.foldLeft(lit(w(0))) { case (acc, (z, j)) => acc + lit(w(j + 1)) * z }
      val errCol    = lit(1.0) / (lit(1.0) + exp(-marginCol)) - y
      val gradAggs  = sum(errCol).as("g0") +: zCols.zipWithIndex.map { case (z, j) => sum(errCol * z).as(s"g${j + 1}") }
      val row       = df.agg(gradAggs.head, gradAggs.tail: _*).head()
      var j = 0
      while (j <= p) {
        val g = row.getDouble(j) / n + (if (j > 0) l2 * w(j) else 0.0)
        w(j) -= stepSize * g
        j += 1
      }
      it += 1
    }
    LogitModel(featureCols, means, stds, w(0), w.drop(1))
  }
}
