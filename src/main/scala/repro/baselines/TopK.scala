package repro.baselines

import repro.core.{Candidate, Explanation, Responsibility, TaskEngine}

/** The Top-K baseline (§5): rank candidates by individual explanation power
  * only (Max-Relevance without the redundancy term), i.e. ascending
  * I(O;T|C,E), and take the best `size`. This is the ablation that selects
  * redundant attribute pairs such as Year-Low-F / Year-Avg-F.
  */
object TopK {
  def explain(engine: TaskEngine, active: Seq[Candidate], size: Int): Explanation = {
    val v1 = engine.effCmiAll
    val picked = active
      .filter(c => v1.contains(c.name))
      .sortBy(c => (v1(c.name), c.name))
      .take(size)
    val finalCmi = if (picked.isEmpty) engine.baseCmi else engine.cmiSet(picked)
    Explanation(picked, finalCmi, engine.baseCmi, Responsibility.compute(engine, picked), stoppedByTest = false)
  }
}
