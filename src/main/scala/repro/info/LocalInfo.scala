package repro.info

/** Entropy / CMI over *already aggregated* contingency cells held on the
  * driver.
  *
  * Spark reduces the raw tuples to weighted cells (thousands of rows at
  * most); the combinatorial parts of the system — the Brute-Force baseline's
  * exhaustive subset search and Alg. 2's refinement-lattice traversal —
  * re-aggregate those cells per subset locally instead of launching one
  * Spark job per subset. Same plug-in estimators as [[InfoTheory]], in bits.
  */
object LocalInfo {

  /** A cell: a tuple of discrete values (one per column) and its weight. */
  type Cells = IndexedSeq[(IndexedSeq[String], Double)]

  private val Log2 = math.log(2.0)

  private def grouped(cells: Cells, idx: Seq[Int]): scala.collection.Map[Seq[String], Double] = {
    val m = new scala.collection.mutable.HashMap[Seq[String], Double]
    cells.foreach { case (vals, w) =>
      if (w > 0) {
        val key = idx.map(vals)
        m.update(key, m.getOrElse(key, 0.0) + w)
      }
    }
    m
  }

  /** H(cols at `idx`) in bits; `mm` applies the Miller–Madow correction. */
  def entropy(cells: Cells, idx: Seq[Int], mm: Boolean = false): Double = {
    if (cells.isEmpty) return 0.0
    val m  = grouped(cells, idx)
    val wt = m.values.sum
    if (wt <= 0) 0.0
    else {
      var s = 0.0
      m.values.foreach(w => s += w * math.log(w))
      val h = math.max(0.0, math.log(wt) / Log2 - s / wt / Log2)
      if (mm) h + (m.size - 1) / (2.0 * wt * Log2) else h
    }
  }

  /** I(x;y|z) in bits; plain MI when z is empty. */
  def cmi(cells: Cells, x: Seq[Int], y: Seq[Int], z: Seq[Int], mm: Boolean = false): Double =
    if (z.isEmpty)
      math.max(0.0, entropy(cells, x, mm) + entropy(cells, y, mm) - entropy(cells, x ++ y, mm))
    else
      math.max(
        0.0,
        entropy(cells, x ++ z, mm) + entropy(cells, y ++ z, mm) -
          entropy(cells, x ++ y ++ z, mm) - entropy(cells, z, mm)
      )

  /** H(x|y) in bits. */
  def condEntropy(cells: Cells, x: Seq[Int], y: Seq[Int]): Double =
    math.max(0.0, entropy(cells, x ++ y) - entropy(cells, y))

  /** G-test of conditional independence X ⊥ Y | Z — the "highly efficient
    * independence test" of HypDB [63] used by the responsibility test.
    *
    * 2N ln2 · I(X;Y|Z) is asymptotically χ² with
    * df = Σ_z (K_{X|z}-1)(K_{Y|z}-1); per-stratum supports make the test
    * degrade gracefully when strata saturate (one tuple per group). Returns
    * true when independence is NOT rejected at level `alpha`.
    */
  def gTestIndependent(cells: Cells, x: Seq[Int], y: Seq[Int], z: Seq[Int], alpha: Double = 0.05): Boolean = {
    val n = size(cells)
    if (n <= 0) return true
    val g = 2.0 * n * Log2 * cmi(cells, x, y, z)
    // df from per-stratum observed supports.
    val strata = if (z.isEmpty) Map(Seq.empty[String] -> cells) else cells.groupBy(c => z.map(c._1))
    var df = 0.0
    strata.values.foreach { cs =>
      val kx = cs.map(c => x.map(c._1)).distinct.size
      val ky = cs.map(c => y.map(c._1)).distinct.size
      df += (kx - 1).toDouble * (ky - 1).toDouble
    }
    if (df < 1) return true
    g <= chiSquareQuantile(df, 1.0 - alpha)
  }

  /** Wilson–Hilferty approximation of the χ² quantile. */
  private[repro] def chiSquareQuantile(df: Double, p: Double): Double = {
    val z = p match { // inverse normal for the few levels we use
      case x if x >= 0.995 => 2.5758
      case x if x >= 0.99  => 2.3263
      case x if x >= 0.975 => 1.9600
      case x if x >= 0.95  => 1.6449
      case x if x >= 0.90  => 1.2816
      case _               => 0.0
    }
    val a = 2.0 / (9.0 * df)
    df * math.pow(1.0 - a + z * math.sqrt(a), 3)
  }

  /** Keep only cells where column `col` equals `v` (a refinement filter). */
  def filter(cells: Cells, col: Int, v: String): Cells =
    cells.filter(_._1(col) == v)

  /** Total weight (group size) of the cells. */
  def size(cells: Cells): Double = cells.iterator.map(_._2).sum
}
