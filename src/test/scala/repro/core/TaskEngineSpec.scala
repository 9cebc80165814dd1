package repro.core

import org.scalatest.matchers.should.Matchers

import repro.{Oracle, SparkSpec}
import repro.info.{Binning, InfoTheory}

class TaskEngineSpec extends SparkSpec with Matchers {

  private lazy val task   = Fixtures.task(spark)
  private lazy val engine = new TaskEngine(task, task.candidates, Fixtures.cfg)

  test("baseCmi is positive: the query exposes a real correlation") {
    engine.baseCmi should be > 0.5
  }

  test("cmiAll covers every candidate with complete cases") {
    val v1 = engine.cmiAll
    v1.keySet should contain allOf ("good", "good_copy", "irrel", "halfmiss", "channel")
  }

  test("the planted driver has far lower conditional CMI than noise") {
    val v1 = engine.cmiAll
    v1("good") should be < v1("irrel") - 0.5
    v1("good") should be < engine.baseCmi * 0.5
  }

  test("batched cmiAll equals the direct per-set computation (same dataflow result)") {
    val v1 = engine.cmiAll
    for (name <- Seq("good", "irrel", "channel")) {
      val direct = engine.cmiSet(Seq(engine.candidate(name)))
      v1(name) shouldBe direct +- 1e-6
    }
  }

  test("miAllVs finds the redundant alias and not the noise") {
    val mi = engine.miAllVs(engine.candidate("good"))
    // entity-level attributes over 48 entities carry some spurious MI; the
    // alias must stand far above that floor
    mi("good_copy") should be > 1.5
    mi("irrel") should be < 0.8
    mi("good_copy") should be > mi("irrel") + 0.8
  }

  test("miAllVs against a table attribute works (mixed-source pairing)") {
    val mi = engine.miAllVs(engine.candidate("channel"))
    // channel is independent of every entity attribute by construction
    mi("good") should be < 0.1
  }

  test("cmiSet on the true confounder explains away most of the correlation") {
    val c = engine.cmiSet(Seq(engine.candidate("good")))
    c should be < engine.baseCmi * 0.45
  }

  test("cmiSet with multiple attributes monotonically refines the partition") {
    val one = engine.cmiSet(Seq(engine.candidate("good")))
    val two = engine.cmiSet(Seq(engine.candidate("good"), engine.candidate("channel")))
    // channel captures the remaining in-table effect
    two should be < one + 0.05
  }

  test("cmiOGiven: the alias carries no information about O given the original") {
    val alias = engine.cmiOGiven(engine.candidate("good_copy"), Seq(engine.candidate("good")))
    val fresh = engine.cmiOGiven(engine.candidate("channel"), Seq(engine.candidate("good")))
    alias should be < 0.25
    fresh should be > 0.0
  }

  test("indepOGiven accepts the exhausted alias and rejects the raw driver") {
    engine.indepOGiven(engine.candidate("irrel"), Seq(engine.candidate("good"))) shouldBe true
    engine.indepOGiven(engine.candidate("good"), Nil) shouldBe false
  }

  test("onlineStats flags the 1:1 code attribute as an FD with T") {
    val s = engine.onlineStats("shop_code")
    s.hTE shouldBe 0.0 +- 1e-6
    s.hET shouldBe 0.0 +- 1e-6
  }

  test("onlineStats: noise has low relevance, driver has high relevance") {
    val stats = engine.onlineStats
    // entity-level noise keeps some spurious marginal MI (finite entity
    // pool); the planted driver must dominate it by a wide margin
    stats("irrel").relO should be < 0.6
    stats("good").relO should be > 1.0
    stats("good").relO should be > stats("irrel").relO * 2
    stats("good").miET should be > 1.0
  }

  test("half-missing attribute is scored on complete cases only") {
    val v1 = engine.cmiAll
    // halfmiss equals good on present entities -> still explains well
    v1("halfmiss") should be < engine.baseCmi * 0.6
  }

  test("attrCells matches a DuckDB join+group-by for one attribute (oracle)") {
    import org.apache.spark.sql.functions._
    val ent    = Binning.binColumns(Fixtures.entityTable(spark), Seq("good"), 6)
    val factsB = Binning.binColumns(
      task.df.selectExpr("shop", "cast(o as double) as o"), Seq("o"), 6)
    val got = engine.attrCells
      .where(col("attr") === "good")
      .selectExpr("ebin", "__t as t", "__o as obin", s"CAST(${InfoTheory.W} AS DOUBLE) AS w")
    Oracle.assertEquivalent(
      got,
      """SELECT e.good AS ebin, f.shop AS t, f.o AS obin, CAST(count(*) AS DOUBLE) AS w
        |FROM f JOIN e ON f.shop = e.shop
        |WHERE e.good IS NOT NULL
        |GROUP BY e.good, f.shop, f.o""".stripMargin,
      "f" -> factsB,
      "e" -> ent.select("shop", "good")
    )
  }

  test("joinedWith carries IPW weight products") {
    import org.apache.spark.sql.functions._
    val weighted = Fixtures.entityTable(spark)
      .withColumn(EntitySource.weightCol("good"), lit(2.0))
    val src2  = Fixtures.source(spark).copy(table = weighted)
    val task2 = task.copy(sources = Seq(src2))
    val e2    = new TaskEngine(task2, task2.candidates, Fixtures.cfg)
    val wsum  = e2.joinedWith(Seq(e2.candidate("good")))
      .agg(sum(col("__wt"))).head().getDouble(0)
    val n = task2.df.count().toDouble
    wsum shouldBe (2.0 * n) +- 1e-6
    e2.close()
  }

  test("weighting leaves scale-invariant statistics unchanged") {
    import org.apache.spark.sql.functions._
    val weighted = Fixtures.entityTable(spark)
      .withColumn(EntitySource.weightCol("good"), lit(3.0)) // uniform weight = no-op for CMI
    val src2  = Fixtures.source(spark).copy(table = weighted)
    val task2 = task.copy(sources = Seq(src2))
    val e2    = new TaskEngine(task2, task2.candidates, Fixtures.cfg)
    // Uniform weights rescale all cells: plug-in CMI is scale-invariant, the
    // MM correction shifts slightly with the effective N.
    e2.cmiAll("good") shouldBe engine.cmiAll("good") +- 0.02
    e2.close()
  }

  test("reserved column names and duplicate candidates are rejected") {
    an[IllegalArgumentException] should be thrownBy
      QueryTask("bad", task.df, "shop", "o", Seq("channel", "channel"), Nil)
  }

  test("candidates with unknown names fail fast") {
    an[RuntimeException] should be thrownBy engine.candidate("nope")
  }
}
