package repro.baselines

import repro.core.{Candidate, Explanation, Responsibility, TaskEngine}

/** The HypDB baseline [63] as evaluated in §5.
  *
  * HypDB detects confounding attributes via causal analysis — covariates
  * associated with both the exposure and the outcome — and ranks them by
  * responsibility. Its cost grows exponentially with |A|, so the paper caps
  * its candidate set at 50 attributes *dropped uniformly at random*; that cap
  * (not the detection) is what degrades its explanation quality when an
  * important attribute is unlucky. We reproduce both the detection and the
  * cap.
  */
object HypDb {

  /** Association threshold of the confounder test, in bits. */
  val AssocEps = 0.01

  def explain(
      engine: TaskEngine,
      active: Seq[Candidate],
      size: Int,
      cap: Int = 50,
      seed: Long = 17L
  ): Explanation = {
    val rnd    = new scala.util.Random(seed)
    val capped = rnd.shuffle(active.sortBy(_.name).toVector).take(cap)
    val stats  = engine.onlineStats
    val v1     = engine.effCmiAll
    // Confounder test: E must be associated with T, and with O given T.
    val confounders = capped.filter { c =>
      stats.get(c.name).exists(s => s.miET > AssocEps && s.relOT > AssocEps) && v1.contains(c.name)
    }
    // Rank by individual responsibility: the drop in I(O;T|C) when
    // conditioning on E alone.
    val picked = confounders
      .sortBy(c => (-(engine.baseCmi - v1(c.name)), c.name))
      .take(size)
    val finalCmi = if (picked.isEmpty) engine.baseCmi else engine.cmiSet(picked)
    Explanation(picked, finalCmi, engine.baseCmi, Responsibility.compute(engine, picked), stoppedByTest = false)
  }
}
