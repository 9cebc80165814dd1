package repro.core

import repro.missing.Ipw

/** The prepared state shared by MESA and the baselines: offline pruning and
  * IPW weighting applied, engine built, online pruning computed.
  * The paper runs every baseline (except MESA⁻) on the pruned candidate set.
  */
final case class Prepared(
    task: QueryTask,
    engine: TaskEngine,
    afterOffline: Seq[Candidate],
    offlineDropped: Map[String, String],
    afterOnline: Seq[Candidate],
    onlineDropped: Map[String, String]
) {
  def close(): Unit = engine.close()
}

/** End-to-end result of one MESA run. */
final case class MesaResult(
    taskName: String,
    explanation: Explanation,
    candidatesTotal: Int,
    candidatesAfterOffline: Int,
    candidatesAfterOnline: Int,
    millis: Long
)

/** The MESA system (§4): offline pruning → IPW weighting for attributes with
  * selection bias → online pruning → MCIMR.
  *
  * MESA⁻ (the no-pruning ablation of §5) is obtained with
  * `cfg.copy(pruneOffline = false, pruneOnline = false)`.
  */
object Mesa {

  def prepare(task: QueryTask, cfg: MesaConfig): Prepared = {
    val all = task.candidates.sortBy(_.name)
    val (offKept, offDropped) =
      if (cfg.pruneOffline) Pruning.offline(task, cfg) else (all, Map.empty[String, String])
    val weighted = if (cfg.ipw) Ipw.weightedTask(task, offKept, cfg) else task
    val engine   = new TaskEngine(weighted, offKept, cfg)
    val (onKept, onDropped) =
      if (cfg.pruneOnline) Pruning.online(engine, offKept, cfg)
      else (offKept, Map.empty[String, String])
    Prepared(weighted, engine, offKept, offDropped, onKept, onDropped)
  }

  /** Run MCIMR on an already-prepared state (lets benches share the engine
    * across methods).
    */
  def explainPrepared(p: Prepared): Explanation = Mcimr.run(p.engine, p.afterOnline)

  /** One-shot convenience: prepare, explain, release caches. */
  def explain(task: QueryTask, cfg: MesaConfig = MesaConfig()): MesaResult = {
    val t0 = System.nanoTime()
    val p  = prepare(task, cfg)
    try {
      val e = explainPrepared(p)
      MesaResult(
        taskName = task.name,
        explanation = e,
        candidatesTotal = task.candidates.size,
        candidatesAfterOffline = p.afterOffline.size,
        candidatesAfterOnline = p.afterOnline.size,
        millis = (System.nanoTime() - t0) / 1000000L
      )
    } finally p.close()
  }
}
