package repro.baselines

import org.apache.spark.sql.functions._

import repro.core.{Candidate, Explanation, Responsibility, TaskEngine}
import repro.info.LocalInfo

/** The Brute-Force baseline: the exact optimum of Def. 2.1,
  * argmin over non-empty E ⊆ A of I(O;T|E,C)·|E| (the paper's objective is
  * degenerate at E = ∅, so like the paper's implementation we search
  * non-empty subsets and fall back to ∅ only when nothing improves on
  * I(O;T|C)).
  *
  * The paper could only run it on the small datasets (Covid-19, Forbes) even
  * after pruning. We additionally restrict the pool to the `poolCap` most
  * individually-relevant candidates: Spark reduces the data to contingency
  * cells over (T, O, pool) once, and the exponential subset enumeration then
  * runs on those cells locally — one Spark job total instead of one per
  * subset.
  */
object BruteForce {

  private val NullTag = "__null"

  def explain(
      engine: TaskEngine,
      active: Seq[Candidate],
      maxSize: Int,
      poolCap: Int = 12
  ): Explanation = {
    val v1   = engine.effCmiAll
    val pool = active
      .filter(c => v1.contains(c.name) && engine.passesPermutationFloor(c))
      .sortBy(c => (v1(c.name), c.name))
      .take(poolCap)
    if (pool.isEmpty)
      return Explanation(Nil, engine.baseCmi, engine.baseCmi, Nil, stoppedByTest = false)

    val names = pool.map(_.name)
    val cols  = Seq(TaskEngine.TCol, TaskEngine.OCol) ++ names
    val frame = engine.joinedWith(pool)
    val cells: LocalInfo.Cells = frame
      .na.drop("any", Seq(TaskEngine.TCol, TaskEngine.OCol))
      .groupBy(cols.map(col): _*)
      .agg(sum(col("__wt")).as("w"))
      .collect()
      .toIndexedSeq
      .map { r =>
        val vals = IndexedSeq.tabulate(cols.size)(i => if (r.isNullAt(i)) NullTag else r.get(i).toString)
        (vals, r.getDouble(cols.size))
      }

    def cmiOf(subset: Seq[Int]): Double = {
      // Complete cases of this subset only.
      val cs = cells.filter(c => subset.forall(i => c._1(i) != NullTag))
      LocalInfo.cmi(cs, Seq(0), Seq(1), subset, mm = true)
    }

    var bestSubset: Seq[Int] = Nil
    var bestObj              = Double.PositiveInfinity
    var bestCmi              = engine.baseCmi
    val idxs                 = names.indices.map(_ + 2)
    for (sz <- 1 to math.min(maxSize, idxs.size); subset <- idxs.combinations(sz)) {
      val c   = cmiOf(subset)
      val obj = c * sz
      if (obj < bestObj - 1e-12 || (math.abs(obj - bestObj) <= 1e-12 && c < bestCmi)) {
        bestObj = obj; bestCmi = c; bestSubset = subset
      }
    }

    if (bestCmi >= engine.baseCmi)
      Explanation(Nil, engine.baseCmi, engine.baseCmi, Nil, stoppedByTest = false)
    else {
      val picked = bestSubset.map(i => pool(i - 2))
      Explanation(
        picked,
        engine.cmiSet(picked),
        engine.baseCmi,
        Responsibility.compute(engine, picked),
        stoppedByTest = false
      )
    }
  }
}
