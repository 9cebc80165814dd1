package repro.study

import org.apache.spark.sql.SparkSession
import org.apache.spark.sql.functions._

import repro.baselines.{BruteForce, HypDb, OlsExplainer, TopK}
import repro.core._
import repro.data._

/** One explanation method's output on one study query. */
final case class MethodRun(method: String, expl: Explanation, millis: Long)

/** All methods on one study query. */
final case class QueryRun(q: StudyQuery, runs: Seq[MethodRun]) {
  def run(method: String): Option[MethodRun] = runs.find(_.method == method)
}

/** The experiment harness behind jobs/ and bench/: runs the six methods of
  * §5 on the study queries and renders the paper's tables.
  */
object Harness {

  val Methods = Seq("Brute-Force", "MESA-", "MESA", "Top-K", "LR", "HypDB")

  /** Default config of the study (k = 5, 1-hop extraction, pruning + IPW on). */
  def defaultCfg: MesaConfig = MesaConfig()

  def runQuery(q: StudyQuery, cfg: MesaConfig = defaultCfg, withMesaMinus: Boolean = true): QueryRun = {
    def timed[A](f: => A): (A, Long) = {
      val t0 = System.nanoTime(); val a = f; (a, (System.nanoTime() - t0) / 1000000L)
    }

    val (prep, prepMs) = timed(Mesa.prepare(q.task, cfg))
    try {
      val engine          = prep.engine
      val (mesa, mesaMs)  = timed(Mcimr.run(engine, prep.afterOnline))
      val size            = math.max(2, mesa.attrs.size)
      val (topk, topkMs)  = timed(TopK.explain(engine, prep.afterOnline, size))
      val (hypdb, hdbMs)  = timed(HypDb.explain(engine, prep.afterOnline, size))
      val (lrPicked, lrMs) = timed(OlsExplainer.explain(prep.task, prep.afterOnline, size))
      val lr = Explanation(
        lrPicked,
        if (lrPicked.isEmpty) engine.baseCmi else engine.cmiSet(lrPicked),
        engine.baseCmi, Nil, stoppedByTest = false
      )
      val bf: Option[MethodRun] =
        if (q.small) {
          val (e, ms) = timed(BruteForce.explain(engine, prep.afterOnline, maxSize = math.max(3, size)))
          Some(MethodRun("Brute-Force", e, ms))
        } else None

      val mesaMinus: Option[MethodRun] =
        if (withMesaMinus) {
          val cfg2 = cfg.copy(pruneOffline = false, pruneOnline = false)
          val ((e, ms)) = timed {
            val p2 = Mesa.prepare(q.task, cfg2)
            try Mcimr.run(p2.engine, p2.afterOnline)
            finally p2.close()
          }
          Some(MethodRun("MESA-", e, ms))
        } else None

      QueryRun(
        q,
        bf.toSeq ++ mesaMinus.toSeq ++ Seq(
          MethodRun("MESA", mesa, prepMs + mesaMs),
          MethodRun("Top-K", topk, topkMs),
          MethodRun("LR", lr, lrMs),
          MethodRun("HypDB", hypdb, hdbMs)
        )
      )
    } finally prep.close()
  }

  def runStudy(
      spark: SparkSession,
      sfSo: Double,
      sfFlights: Double,
      cfg: MesaConfig = defaultCfg
  ): Seq[QueryRun] =
    QueryCatalog.all(spark, sfSo, sfFlights).map { q =>
      val r = runQuery(q, cfg)
      Console.err.println(s"[Harness] ${q.id}: " + r.runs.map(m => s"${m.method}=${m.expl.names.mkString("+")}").mkString("  "))
      r
    }

  // ------------------------------------------------------------------ tables

  /** Table 1: datasets, sizes, number of extracted attributes, link columns. */
  def table1(spark: SparkSession, sfSo: Double, sfFlights: Double): String = {
    val bundles = Seq(
      SoData.bundle(spark, sfSo),
      CovidData.bundle(spark),
      FlightsData.bundle(spark, sfFlights),
      ForbesData.bundle(spark)
    )
    val header = f"${"Dataset"}%-10s | ${"n (measured)"}%12s | ${"n (SF=1 design)"}%15s | ${"|E|"}%5s | Columns used for extraction"
    val rows = bundles.map { b =>
      val n     = b.facts.count()
      val nAttr = b.sources().map(_.attrs.size).sum
      f"${b.name}%-10s | $n%12d | ${b.designRows}%15d | $nAttr%5d | ${b.links.map(_.factCol).mkString(", ")}"
    }
    (header +: rows).mkString("\n")
  }

  /** Table 2: the explanation each method produces for each query. */
  def table2(runs: Seq[QueryRun]): String = {
    val methods = Methods
    val header  = (f"${"Query"}%-11s" +: methods.map(m => f"$m%-28s")).mkString(" | ")
    val rows = runs.map { qr =>
      val cells = methods.map { m =>
        val s = qr.run(m).map(r => if (r.expl.attrs.isEmpty) "(none)" else r.expl.names.mkString(", ")).getOrElse("-")
        f"${s.take(28)}%-28s"
      }
      (f"${qr.q.id}%-11s" +: cells).mkString(" | ")
    }
    (header +: rows).mkString("\n")
  }

  /** Table 3: average simulated-subject score and variance per method. */
  def table3(runs: Seq[QueryRun], seed: Long = 2023L): (Seq[(String, Double, Double)], String) = {
    val rows = Methods.flatMap { m =>
      val scored = runs.flatMap { qr =>
        qr.run(m).map { r =>
          SimulatedSubjects.score(r.expl, qr.q.truth, seed + (qr.q.id + m).hashCode)
        }
      }
      if (scored.isEmpty) None
      else {
        val avg  = scored.map(_._1).sum / scored.size
        val avgV = scored.map(_._2).sum / scored.size
        Some((m, avg, avgV))
      }
    }
    val text = (f"${"Baseline"}%-12s | ${"Avg Score"}%9s | ${"Avg Variance"}%12s" +:
      rows.map { case (m, a, v) => f"$m%-12s | $a%9.2f | $v%12.2f" }).mkString("\n")
    (rows, text)
  }

  /** Table 4: top-5 unexplained data groups for SO Q1 (τ = 0.2). */
  def table4(spark: SparkSession, sfSo: Double, cfg: MesaConfig = defaultCfg,
             tau: Double = 0.05, k: Int = 5): (Seq[Subgroup], String) = {
    val q    = QueryCatalog.soQueries(spark, sfSo).head
    val prep = Mesa.prepare(q.task, cfg)
    try {
      val mesa = Mcimr.run(prep.engine, prep.afterOnline)
      // The analyst of §4.3 investigates the primary 2-attribute explanation
      // ({HDI, GINI} in the paper).
      val expl   = mesa.attrs.take(2)
      val refine = Seq(Candidate("Continent", None), prep.engine.candidate("Currency"))
      val groups = UnexplainedSubgroups.topK(prep.engine, expl, refine, tau, k)
      val header = f"${"Rank"}%4s | ${"Size"}%8s | ${"Score"}%6s | Data group   (explanation E = ${expl.map(_.name).mkString(", ")})"
      val rows = groups.zipWithIndex.map { case (g, i) =>
        f"${i + 1}%4d | ${g.size.round}%8d | ${g.score}%6.2f | ${g.pretty}"
      }
      (groups, (header +: rows).mkString("\n"))
    } finally prep.close()
  }

  // ----------------------------------------------- §5.1 usefulness statistic

  /** The §5.1 random-query experiment: MESA is "useful" when the explanation
    * lowers the partial correlation and contains at least one extracted
    * attribute. Returns (useful, total).
    */
  def usefulness(spark: SparkSession, sfSo: Double, sfFlights: Double, perDataset: Int,
                 cfg: MesaConfig = defaultCfg, seed: Long = 5L): (Int, Int) = {
    val rnd = new scala.util.Random(seed)
    val specs: Seq[(DatasetBundle, Seq[String], Seq[String], Seq[String])] = Seq(
      (SoData.bundle(spark, sfSo), Seq("Country", "Continent"), Seq("Salary", "Age", "YearsCode"),
        Seq("Gender", "DevType", "Hobby")),
      (CovidData.bundle(spark), Seq("Country", "Continent"), Seq("Deaths_per_100", "Confirmed", "New_cases"),
        Seq("WHO_Region")),
      (FlightsData.bundle(spark, sfFlights), Seq("Origin_City", "Origin_State", "Airline"),
        Seq("Departure_Delay", "Security_Delay", "Distance"), Seq("Month", "Day_Of_Week")),
      (ForbesData.bundle(spark), Seq("Name"), Seq("Pay"), Seq("Category", "Year"))
    )
    var useful = 0
    var total  = 0
    specs.foreach { case (bundle, ts, os, wheres) =>
      val sources = bundle.sources()
      (1 to perDataset).foreach { _ =>
        val t = ts(rnd.nextInt(ts.size))
        val o = os(rnd.nextInt(os.size))
        if (t != o) {
          // random context covering >= 10% of the tuples
          val wAttr  = wheres(rnd.nextInt(wheres.size))
          val counts = bundle.facts.groupBy(wAttr).count().collect()
          val n      = counts.map(_.getLong(1)).sum
          val big    = counts.filter(_.getLong(1) >= n / 10)
          val df =
            if (big.isEmpty || rnd.nextBoolean()) bundle.facts
            else bundle.facts.where(col(wAttr) === big(rnd.nextInt(big.length)).get(0))
          val tableAttrs = (os ++ wheres).filterNot(c => c == t || c == o || c == wAttr)
          val task = QueryTask(s"rand-${bundle.name}-$total", df, t, o, tableAttrs, sources)
          val res  = Mesa.explain(task, cfg)
          val e    = res.explanation
          val hasExtracted = e.attrs.exists(!_.isTableAttr)
          if (e.finalCmi < e.baseCmi * 0.95 && hasExtracted) useful += 1
          total += 1
        }
      }
    }
    (useful, total)
  }
}
