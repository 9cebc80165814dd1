package repro.info

import org.scalacheck.Gen
import org.scalacheck.rng.Seed
import org.scalatest.funsuite.AnyFunSuite
import org.scalatest.matchers.should.Matchers

class LocalInfoSpec extends AnyFunSuite with Matchers {

  /** Plain-ScalaCheck property driver (scalatestplus is not on the offline
    * classpath): samples the generator over 100 fixed seeds.
    */
  private def forAll[A](gen: Gen[A])(body: A => Unit): Unit =
    (1 to 100).foreach { i =>
      gen.apply(Gen.Parameters.default, Seed(i.toLong)).foreach(body)
    }

  private def mk(rows: Seq[(Seq[String], Double)]): LocalInfo.Cells =
    rows.toIndexedSeq.map { case (vs, w) => (vs.toIndexedSeq, w) }

  test("entropy of uniform cells is log2(n)") {
    val cells = mk((1 to 16).map(i => (Seq(s"v$i"), 1.0)))
    LocalInfo.entropy(cells, Seq(0)) shouldBe 4.0 +- 1e-9
  }

  test("entropy ignores non-positive weights") {
    val cells = mk(Seq((Seq("a"), 1.0), (Seq("b"), 0.0), (Seq("c"), -1.0)))
    LocalInfo.entropy(cells, Seq(0)) shouldBe 0.0 +- 1e-9
  }

  test("cmi of a perfect confounder is 0") {
    val cells = mk(for (e <- 0 until 4) yield (Seq(s"t${e % 2}", s"o${e % 3}", s"e$e"), 10.0))
    LocalInfo.cmi(cells, Seq(0), Seq(1), Seq(2)) shouldBe 0.0 +- 1e-9
    LocalInfo.cmi(cells, Seq(0), Seq(1), Nil) should be > 0.3
  }

  test("filter keeps only matching cells; size sums weights") {
    val cells = mk(Seq((Seq("a", "x"), 2.0), (Seq("b", "x"), 3.0), (Seq("a", "y"), 4.0)))
    val f     = LocalInfo.filter(cells, 0, "a")
    f.size shouldBe 2
    LocalInfo.size(f) shouldBe 6.0 +- 1e-12
    LocalInfo.size(cells) shouldBe 9.0 +- 1e-12
  }

  test("gTest accepts independence on product cells") {
    val cells = mk(for (x <- 0 until 3; y <- 0 until 3) yield (Seq(s"x$x", s"y$y"), 20.0))
    LocalInfo.gTestIndependent(cells, Seq(0), Seq(1), Nil) shouldBe true
  }

  test("gTest rejects strong dependence") {
    val cells = mk((0 until 4).map(v => (Seq(s"x$v", s"y$v"), 100.0)))
    LocalInfo.gTestIndependent(cells, Seq(0), Seq(1), Nil) shouldBe false
  }

  test("gTest accepts conditional independence given the confounder") {
    val cells = mk(for (z <- 0 until 4) yield (Seq(s"x${z % 2}", s"y${z % 3}", s"z$z"), 50.0))
    LocalInfo.gTestIndependent(cells, Seq(0), Seq(1), Seq(2)) shouldBe true
    LocalInfo.gTestIndependent(cells, Seq(0), Seq(1), Nil) shouldBe false
  }

  test("gTest degrades gracefully on saturated strata (df -> 0 => accept)") {
    // One tuple per stratum: nothing is estimable, test must not reject.
    val cells = mk((0 until 50).map(i => (Seq(s"x$i", s"y$i", s"z$i"), 1.0)))
    LocalInfo.gTestIndependent(cells, Seq(0), Seq(1), Seq(2)) shouldBe true
  }

  test("chiSquareQuantile approximates known values") {
    LocalInfo.chiSquareQuantile(1, 0.95) shouldBe 3.841 +- 0.15
    LocalInfo.chiSquareQuantile(10, 0.95) shouldBe 18.307 +- 0.35
    LocalInfo.chiSquareQuantile(100, 0.95) shouldBe 124.342 +- 1.0
  }

  // ---- property tests ----

  private val cellGen: Gen[LocalInfo.Cells] = for {
    n    <- Gen.choose(1, 40)
    rows <- Gen.listOfN(n, for {
      x <- Gen.choose(0, 4); y <- Gen.choose(0, 4); z <- Gen.choose(0, 2)
      w <- Gen.choose(1, 20)
    } yield (IndexedSeq(s"x$x", s"y$y", s"z$z"), w.toDouble))
  } yield rows.toIndexedSeq

  test("property: entropy is non-negative and bounded by log2(support)") {
    forAll(cellGen) { cells =>
      val h = LocalInfo.entropy(cells, Seq(0))
      val support = cells.map(_._1(0)).distinct.size
      h should be >= 0.0
      h should be <= math.log(math.max(support, 1)) / math.log(2) + 1e-9
    }
  }

  test("property: MI and CMI are non-negative") {
    forAll(cellGen) { cells =>
      LocalInfo.cmi(cells, Seq(0), Seq(1), Nil) should be >= 0.0
      LocalInfo.cmi(cells, Seq(0), Seq(1), Seq(2)) should be >= 0.0
    }
  }

  test("property: chain rule I(X;YZ) = I(X;Z) + I(X;Y|Z)") {
    forAll(cellGen) { cells =>
      val lhs = LocalInfo.cmi(cells, Seq(0), Seq(1, 2), Nil)
      val rhs = LocalInfo.cmi(cells, Seq(0), Seq(2), Nil) + LocalInfo.cmi(cells, Seq(0), Seq(1), Seq(2))
      lhs shouldBe rhs +- 1e-9
    }
  }

  test("property: conditioning cannot increase entropy") {
    forAll(cellGen) { cells =>
      LocalInfo.condEntropy(cells, Seq(0), Seq(1)) should be <= LocalInfo.entropy(cells, Seq(0)) + 1e-9
    }
  }

  test("property: MM-corrected entropy >= plug-in entropy") {
    forAll(cellGen) { cells =>
      LocalInfo.entropy(cells, Seq(0), mm = true) should be >= LocalInfo.entropy(cells, Seq(0))
    }
  }
}
