package repro

import repro.core._
import repro.study._

/** Tuning diagnostic (not a test): prints MESA's selection trace on the
  * study queries. Run with
  * `sbt -batch "Test/runMain repro.Diag so"` (or covid/flights/forbes/all).
  */
object Diag {
  def main(args: Array[String]): Unit = {
    val spark = SparkSpec.shared
    val which = args.headOption.getOrElse("so")
    val cfg   = Harness.defaultCfg

    val queries = which match {
      case "so"      => QueryCatalog.soQueries(spark, 1.0)
      case "covid"   => QueryCatalog.covidQueries(spark)
      case "flights" => QueryCatalog.flightsQueries(spark, 0.02)
      case "forbes"  => QueryCatalog.forbesQueries(spark)
      case _         => QueryCatalog.all(spark, 1.0, 0.02)
    }

    val selected = args.drop(1).headOption match {
      case Some(idx) => Seq(queries(idx.toInt))
      case None      => queries
    }
    selected.foreach { q =>
      val t0   = System.nanoTime()
      val prep = Mesa.prepare(q.task, cfg)
      try {
        val e  = prep.engine
        val v1 = e.effCmiAll
        println(s"\n=== ${q.id}: ${q.description} ===")
        println(f"candidates: total=${q.task.candidates.size} afterOffline=${prep.afterOffline.size} afterOnline=${prep.afterOnline.size}")
        println(f"baseCmi=${e.baseCmi}%.3f")
        val top = prep.afterOnline.filter(c => v1.contains(c.name)).sortBy(c => v1(c.name)).take(12)
        println("top v1: " + top.map(c => f"${c.name}=${v1(c.name)}%.3f").mkString(", "))
        println("floors: " + e.permutationFloors.map { case (k, f) => f"$k=$f%.3f" }.mkString(", "))
        val interesting = (top.take(4).map(_.name) ++ Seq("Gini", "Gini_Rank", "Population_Census", "HDI")).distinct
        interesting.foreach { n =>
          for (vv <- e.cmiAll.get(n)) {
            val b  = e.basePerAttr.getOrElse(n, Double.NaN)
            val sp = e.attrSupport.getOrElse(n, -1L)
            val fl = e.candidates.find(_.name == n).exists(e.passesPermutationFloor)
            println(f"  detail $n%-22s support=$sp%4d v1cc=$vv%.3f basecc=$b%.3f eff=${v1.getOrElse(n, Double.NaN)}%.3f floorPass=$fl")
          }
        }
        val expl = Mcimr.run(e, prep.afterOnline)
        println(s"MESA: ${expl.names.mkString(", ")}  finalCmi=" + f"${expl.finalCmi}%.3f stopped=${expl.stoppedByTest}")
        println("resp: " + expl.responsibilities.map { case (c, r) => f"${c.name}=$r%.2f" }.mkString(", "))
        println("truth recall=" + f"${q.truth.recall(expl.names)}%.2f precision=${q.truth.precision(expl.names)}%.2f quality=${SimulatedSubjects.quality(expl, q.truth)}%.2f")
        println(f"elapsed=${(System.nanoTime() - t0) / 1e9}%.1f s")
      } finally prep.close()
    }
    spark.stop()
  }
}
