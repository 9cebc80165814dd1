package repro.core

/** The output of an explanation algorithm: the attribute set E, the residual
  * partial correlation I(O;T|E,C) ("explainability score" of §5.1), the
  * unconditioned I(O;T|C) it started from, and per-attribute responsibilities
  * (Def. 2.2).
  */
final case class Explanation(
    attrs: Seq[Candidate],
    finalCmi: Double,
    baseCmi: Double,
    responsibilities: Seq[(Candidate, Double)],
    stoppedByTest: Boolean
) {
  def names: Seq[String] = attrs.map(_.name)
  /** 1 - I(O;T|E)/I(O;T): the fraction of the correlation explained away. */
  def improvement: Double =
    if (baseCmi <= 0) 0.0 else math.max(0.0, 1.0 - finalCmi / baseCmi)
}

/** Degree of responsibility (Def. 2.2): the normalized marginal contribution
  * of each selected attribute, Resp(E_i) =
  * [I(O;T|E\{E_i},C) - I(O;T|E,C)] / Σ_j [I(O;T|E\{E_j},C) - I(O;T|E,C)].
  */
object Responsibility {
  def compute(engine: TaskEngine, attrs: Seq[Candidate]): Seq[(Candidate, Double)] = {
    if (attrs.isEmpty) return Nil
    if (attrs.size == 1) return Seq(attrs.head -> 1.0)
    val full     = engine.cmiSet(attrs)
    val contribs = attrs.map(a => a -> (engine.cmiSet(attrs.filterNot(_ == a)) - full))
    val denom    = contribs.map(_._2).sum
    if (math.abs(denom) < 1e-12) attrs.map(_ -> 0.0)
    else contribs.map { case (a, c) => a -> c / denom }
  }
}

/** The MCIMR algorithm (Alg. 1): incrementally select the attribute
  * minimizing Min-Conditional-mutual-Information + Min-Redundancy,
  *
  *   E_k = argmin_E [ I(O;T|C,E) + (1/|E_sel|) Σ_{E'∈E_sel} I(E;E') ],
  *
  * stopping early when the responsibility test (Lemma 4.2,
  * I(O; E_new | E_sel) ≈ 0) says the next attribute cannot contribute.
  *
  * The v1 terms I(O;T|C,E) for *all* candidates come from one batched Spark
  * job ([[TaskEngine.cmiAll]]); each iteration adds one batched job for the
  * redundancy terms against the newly selected attribute — O(k·|A|) CMI
  * evaluations total, computed in O(k) Spark jobs.
  */
object Mcimr {

  def run(engine: TaskEngine, active: Seq[Candidate]): Explanation = {
    val cfg = engine.cfg
    val v1  = engine.effCmiAll
    // Candidates with no complete cases never make it into the cell stats.
    var remaining = active
      .filter(c => v1.contains(c.name) && engine.passesPermutationFloor(c))
      .sortBy(_.name)
    var selected  = Vector.empty[Candidate]
    val redSum    = scala.collection.mutable.HashMap.empty[String, Double].withDefaultValue(0.0)
    var stopped   = false

    var i = 0
    while (i < cfg.k && remaining.nonEmpty && !stopped) {
      val best = remaining.minBy { c =>
        val red = if (selected.isEmpty) 0.0 else redSum(c.name) / selected.size
        (v1(c.name) + red, c.name) // deterministic tie-break
      }
      // Responsibility test (Lemma 4.2): O ⊥ best | selected  ⇒  Resp ≤ 0.
      // Independence is declared either by the χ²-calibrated G-test ([63])
      // or by a bias-corrected CMI below the absolute threshold.
      if (engine.cmiOGiven(best, selected) <= cfg.epsResp || engine.indepOGiven(best, selected)) {
        stopped = true
      } else {
        selected = selected :+ best
        remaining = remaining.filterNot(_ == best)
        if (selected.size < cfg.k && remaining.nonEmpty) {
          val mi = engine.miAllVs(best)
          remaining.foreach(c => redSum(c.name) += mi.getOrElse(c.name, 0.0))
        }
        i += 1
      }
    }

    val finalCmi = if (selected.isEmpty) engine.baseCmi else engine.cmiSet(selected)
    Explanation(
      attrs = selected,
      finalCmi = finalCmi,
      baseCmi = engine.baseCmi,
      responsibilities = Responsibility.compute(engine, selected),
      stoppedByTest = stopped
    )
  }
}
