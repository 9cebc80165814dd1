package repro.core

import org.apache.spark.sql.functions._
import org.scalatest.matchers.should.Matchers

import repro.SparkSpec
import repro.baselines.BruteForce

class McimrSpec extends SparkSpec with Matchers {

  /** Planted two-factor task with *discrete* latents (exact under binning,
    * so O is conditionally pure noise given {e1, e2} and noise attributes
    * carry exactly zero conditional information): 72 entities over a 6×4
    * level grid, o = 8·e1 + 5·e2 + noise; e1_copy is a noisy alias of e1 and
    * n1..n5 are pure noise.
    */
  private def twoFactorTask(n: Int = 8000): QueryTask = {
    import repro.SparkSpec.shared.implicits._
    val rnd      = new scala.util.Random(7)
    val nEnts    = 72
    def l1(i: Int) = (i % 6) * 2.0        // levels 0..10
    def l2(i: Int) = ((i / 6) % 4) * 3.0  // levels 0..9
    val ents = (0 until nEnts).map { i =>
      (f"K$i%02d", l1(i), l2(i), l1(i) + rnd.nextGaussian() * 0.05,
        rnd.nextDouble(), rnd.nextDouble(), rnd.nextDouble(), rnd.nextDouble(), rnd.nextDouble())
    }
    val entDf = ents.toDF("k", "e1", "e2", "e1_copy", "n1", "n2", "n3", "n4", "n5")
    val lat   = ents.map(e => (e._1, e._2, e._3)).toDF("k", "__e1", "__e2")
    val facts = spark.range(n)
      .select(
        concat(lit("K"), lpad((rand(3) * nEnts).cast("int").cast("string"), 2, "0")).as("k"),
        (randn(4) * 4.0).as("__noise")) // drawn before the join: deterministic
      .join(lat, "k")
      .withColumn("o", col("__e1") * 8.0 + col("__e2") * 5.0 + col("__noise"))
      .select("k", "o")
    QueryTask("two-factor", facts, "k", "o", Nil,
      Seq(EntitySource("src", "k", entDf, Seq("e1", "e2", "e1_copy", "n1", "n2", "n3", "n4", "n5"))))
  }

  private lazy val task   = twoFactorTask()
  private lazy val engine = new TaskEngine(task, task.candidates, MesaConfig(bins = 6))
  private lazy val expl   = Mcimr.run(engine, engine.candidates)

  test("MCIMR selects both planted factors") {
    expl.names should contain("e1")
    expl.names should contain("e2")
  }

  test("MCIMR selects e1 first (the stronger factor)") {
    expl.names.head shouldBe "e1"
  }

  test("MCIMR does not select the redundant copy or the noise") {
    expl.names should not contain "e1_copy"
    expl.names.toSet.intersect(Set("n1", "n2", "n3", "n4", "n5")) shouldBe empty
  }

  test("MCIMR stops via the responsibility test before exhausting k") {
    expl.attrs.size should be < 5
    expl.stoppedByTest shouldBe true
  }

  test("the explanation explains away most of the correlation") {
    expl.finalCmi should be < expl.baseCmi * 0.35
    expl.improvement should be > 0.65
  }

  test("MCIMR matches Brute-Force on the planted factors (Theorem 4.1 shape)") {
    // The paper notes the residual difference between the two: Brute-Force's
    // I(O;T|E)·|E| objective may keep an extra attribute with insignificant
    // responsibility, which MESA's responsibility test drops. Both must
    // recover the planted factors.
    val bf = BruteForce.explain(engine, engine.candidates, maxSize = 3)
    bf.names.toSet should contain allOf ("e1", "e2")
    expl.names.toSet.subsetOf(bf.names.toSet) shouldBe true
    bf.names should not contain "e1_copy"
  }

  test("responsibilities are positive for contributing attributes and sum to 1") {
    val resp = expl.responsibilities.toMap.map { case (c, v) => c.name -> v }
    resp.values.sum shouldBe 1.0 +- 1e-9
    resp("e1") should be > 0.0
    resp("e2") should be > 0.0
  }

  test("the stronger factor carries the larger responsibility") {
    val resp = expl.responsibilities.toMap.map { case (c, v) => c.name -> v }
    resp("e1") should be > resp("e2")
  }

  test("a non-contributing attribute gets non-positive responsibility (Example 2.4)") {
    // With both planted factors present, the noise attribute is exactly
    // conditionally independent of O: its marginal contribution vanishes.
    val chosen = Seq(engine.candidate("e1"), engine.candidate("e2"), engine.candidate("n1"))
    val resp   = Responsibility.compute(engine, chosen).toMap.map { case (c, v) => c.name -> v }
    resp("n1") should be < 0.15
    resp("e1") should be > 0.4
  }

  test("responsibility of a single attribute is 1") {
    Responsibility.compute(engine, Seq(engine.candidate("e1"))) shouldBe
      Seq(engine.candidate("e1") -> 1.0)
  }

  test("empty candidate set yields the empty explanation") {
    val e = Mcimr.run(engine, Nil)
    e.attrs shouldBe empty
    e.finalCmi shouldBe e.baseCmi
  }

  test("k = 1 returns only the best single attribute") {
    val e1cfg  = MesaConfig(bins = 6, k = 1)
    val eng1   = new TaskEngine(task, task.candidates, e1cfg)
    val e      = Mcimr.run(eng1, eng1.candidates)
    e.names shouldBe Seq("e1")
    eng1.close()
  }

  test("explanation improvement is 0 when nothing is selected") {
    Explanation(Nil, 2.0, 2.0, Nil, stoppedByTest = false).improvement shouldBe 0.0
  }
}
