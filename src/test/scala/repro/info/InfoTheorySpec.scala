package repro.info

import org.apache.spark.sql.DataFrame
import org.scalatest.matchers.should.Matchers

import repro.{Oracle, SparkSpec}

class InfoTheorySpec extends SparkSpec with Matchers {

  import repro.SparkSpec.shared.implicits._

  private val Eps = 1e-9

  private def df2(rows: Seq[(String, String)]): DataFrame = rows.toDF("x", "y")
  private def cellsOf(df: DataFrame, cols: Seq[String]) = InfoTheory.cells(df, cols)

  test("entropy of a uniform distribution is log2(n)") {
    val df = (1 to 8).map(i => s"v$i").toDF("x")
    InfoTheory.entropy(cellsOf(df, Seq("x")), Seq("x")) shouldBe 3.0 +- Eps
  }

  test("entropy of a constant column is 0") {
    val df = Seq.fill(100)("c").toDF("x")
    InfoTheory.entropy(cellsOf(df, Seq("x")), Seq("x")) shouldBe 0.0 +- Eps
  }

  test("entropy of a skewed 2-value distribution matches the closed form") {
    val df = (Seq.fill(3)("a") ++ Seq.fill(1)("b")).toDF("x")
    val expected = -(0.75 * math.log(0.75) + 0.25 * math.log(0.25)) / math.log(2)
    InfoTheory.entropy(cellsOf(df, Seq("x")), Seq("x")) shouldBe expected +- Eps
  }

  test("weighted cells equal replicated rows") {
    val weighted = Seq(("a", 3.0), ("b", 1.0)).toDF("x", "w")
    val repl     = (Seq.fill(3)("a") ++ Seq.fill(1)("b")).toDF("x")
    val hW = InfoTheory.entropy(InfoTheory.cells(weighted, Seq("x"), Some("w")), Seq("x"))
    val hR = InfoTheory.entropy(cellsOf(repl, Seq("x")), Seq("x"))
    hW shouldBe hR +- Eps
  }

  test("MI of independent variables (product design) is exactly 0") {
    val rows = for { x <- Seq("a", "b", "c"); y <- Seq("u", "v") } yield (x, y)
    val c    = cellsOf(df2(rows), Seq("x", "y"))
    InfoTheory.mi(c, Seq("x"), Seq("y")) shouldBe 0.0 +- Eps
  }

  test("MI of identical variables equals the entropy") {
    val rows = Seq("a", "a", "b", "c").map(v => (v, v))
    val c    = cellsOf(df2(rows), Seq("x", "y"))
    val h    = InfoTheory.entropy(c, Seq("x"))
    InfoTheory.mi(c, Seq("x"), Seq("y")) shouldBe h +- Eps
    h should be > 0.0
  }

  test("MI is symmetric") {
    val rnd  = new scala.util.Random(1)
    val rows = (1 to 200).map(_ => (s"x${rnd.nextInt(4)}", s"y${rnd.nextInt(3)}"))
    val c    = cellsOf(df2(rows), Seq("x", "y"))
    InfoTheory.mi(c, Seq("x"), Seq("y")) shouldBe InfoTheory.mi(c, Seq("y"), Seq("x")) +- Eps
  }

  test("conditional entropy H(X|Y)=0 when X is a function of Y") {
    val rnd  = new scala.util.Random(2)
    val rows = (1 to 100).map { _ => val y = rnd.nextInt(5); (s"f$y", s"y$y") }
    val c    = cellsOf(df2(rows), Seq("x", "y"))
    InfoTheory.condEntropy(c, Seq("x"), Seq("y")) shouldBe 0.0 +- Eps
  }

  test("chain rule: I(X;Y,Z) = I(X;Z) + I(X;Y|Z)") {
    val rnd = new scala.util.Random(3)
    val rows = (1 to 300).map { _ =>
      val z = rnd.nextInt(3); val y = (z + rnd.nextInt(2)) % 4; val x = (y + rnd.nextInt(3)) % 5
      (s"x$x", s"y$y", s"z$z")
    }
    val df = rows.toDF("x", "y", "z")
    val c  = cellsOf(df, Seq("x", "y", "z"))
    val lhs = InfoTheory.mi(c, Seq("x"), Seq("y", "z"))
    val rhs = InfoTheory.mi(c, Seq("x"), Seq("z")) + InfoTheory.cmi(c, Seq("x"), Seq("y"), Seq("z"))
    lhs shouldBe rhs +- 1e-9
  }

  test("CMI is 0 when X ⊥ Y | Z by construction") {
    // X and Y both functions of Z only -> conditionally constant.
    val rows = for { z <- 0 until 4; _ <- 1 to 10 } yield (s"x${z % 2}", s"y${z % 3}", s"z$z")
    val c = cellsOf(rows.toDF("x", "y", "z"), Seq("x", "y", "z"))
    InfoTheory.cmi(c, Seq("x"), Seq("y"), Seq("z")) shouldBe 0.0 +- Eps
  }

  test("CMI with empty conditioning set equals MI") {
    val rnd  = new scala.util.Random(4)
    val rows = (1 to 100).map(_ => (s"x${rnd.nextInt(3)}", s"y${rnd.nextInt(3)}"))
    val c    = cellsOf(df2(rows), Seq("x", "y"))
    InfoTheory.cmi(c, Seq("x"), Seq("y"), Nil) shouldBe InfoTheory.mi(c, Seq("x"), Seq("y")) +- Eps
  }

  test("conditioning on a perfect confounder explains away the correlation") {
    // T and O both functions of E: I(O;T) > 0 but I(O;T|E) = 0.
    val rnd = new scala.util.Random(5)
    val rows = (1 to 500).map { _ =>
      val e = rnd.nextInt(4)
      (s"t${e % 3}", s"o${(e * 7) % 4}", s"e$e")
    }
    val c = cellsOf(rows.toDF("t", "o", "e"), Seq("t", "o", "e"))
    InfoTheory.mi(c, Seq("t"), Seq("o")) should be > 0.5
    InfoTheory.cmi(c, Seq("t"), Seq("o"), Seq("e")) shouldBe 0.0 +- Eps
  }

  test("cells drops rows with nulls in the requested columns") {
    val df = Seq(("a", Some("u")), ("b", None), ("a", Some("v"))).toDF("x", "y")
    InfoTheory.cells(df, Seq("x", "y")).count() shouldBe 2
  }

  test("cells counts match DuckDB GROUP BY (oracle)") {
    val rnd  = new scala.util.Random(6)
    val rows = (1 to 200).map(_ => (s"x${rnd.nextInt(3)}", s"y${rnd.nextInt(4)}"))
    val df   = df2(rows)
    val got  = InfoTheory.cells(df, Seq("x", "y"))
      .selectExpr("x", "y", s"CAST(${InfoTheory.W} AS DOUBLE) as w")
    Oracle.assertEquivalent(
      got,
      "SELECT x, y, CAST(count(*) AS DOUBLE) AS w FROM t GROUP BY x, y",
      "t" -> df
    )
  }

  test("Miller-Madow correction adds (K-1)/(2N ln2)") {
    val df = (Seq.fill(10)("a") ++ Seq.fill(20)("b") ++ Seq.fill(30)("c")).toDF("x")
    val c  = cellsOf(df, Seq("x"))
    val h  = InfoTheory.entropy(c, Seq("x"))
    val hm = InfoTheory.entropy(c, Seq("x"), mm = true)
    hm shouldBe (h + 2.0 / (2 * 60 * math.log(2))) +- Eps
  }

  test("MM-corrected MI of independent noise is near 0 while plug-in is biased") {
    val rnd  = new scala.util.Random(7)
    val rows = (1 to 150).map(_ => (s"x${rnd.nextInt(8)}", s"y${rnd.nextInt(8)}"))
    val c    = cellsOf(df2(rows), Seq("x", "y"))
    val plugin = InfoTheory.mi(c, Seq("x"), Seq("y"))
    val mm     = InfoTheory.mi(c, Seq("x"), Seq("y"), mm = true)
    plugin should be > 0.15 // heavy small-sample bias
    mm should be < plugin
    mm should be < 0.12
  }

  test("per-group entropy matches the scalar computation per group") {
    val rnd = new scala.util.Random(8)
    val rows = (1 to 300).map { i =>
      val g = s"g${i % 3}"
      (g, s"x${rnd.nextInt(4)}", s"y${rnd.nextInt(3)}")
    }
    val df    = rows.toDF("g", "x", "y")
    val cAll  = InfoTheory.cells(df, Seq("g", "x", "y"))
    val perG  = InfoTheory.entropyPerGroup(cAll, "g", Seq("x"), "h").collect()
      .map(r => r.getString(0) -> r.getDouble(1)).toMap
    for (g <- Seq("g0", "g1", "g2")) {
      val scalar = InfoTheory.entropy(InfoTheory.cells(df.where(s"g = '$g'"), Seq("x", "y")), Seq("x"))
      perG(g) shouldBe scalar +- Eps
    }
  }

  test("per-group MI and CMI match the scalar computations per group") {
    val rnd = new scala.util.Random(9)
    val rows = (1 to 400).map { i =>
      val g = s"g${i % 2}"
      val z = rnd.nextInt(2)
      (g, s"x${(z + rnd.nextInt(2)) % 3}", s"y${(z + rnd.nextInt(2)) % 3}", s"z$z")
    }
    val df   = rows.toDF("g", "x", "y", "z")
    val cAll = InfoTheory.cells(df, Seq("g", "x", "y", "z"))
    val mi = InfoTheory.miPerGroup(cAll, "g", Seq("x"), Seq("y"), "v").collect()
      .map(r => r.getString(0) -> r.getDouble(1)).toMap
    val cmi = InfoTheory.cmiPerGroup(cAll, "g", Seq("x"), Seq("y"), Seq("z"), "v").collect()
      .map(r => r.getString(0) -> r.getDouble(1)).toMap
    for (g <- Seq("g0", "g1")) {
      val cg = InfoTheory.cells(df.where(s"g = '$g'"), Seq("x", "y", "z"))
      mi(g) shouldBe InfoTheory.mi(cg, Seq("x"), Seq("y")) +- Eps
      cmi(g) shouldBe InfoTheory.cmi(cg, Seq("x"), Seq("y"), Seq("z")) +- Eps
    }
  }

  test("per-group CMI with mm matches scalar mm computation") {
    val rnd = new scala.util.Random(10)
    val rows = (1 to 200).map { i =>
      (s"g${i % 2}", s"x${rnd.nextInt(3)}", s"y${rnd.nextInt(3)}", s"z${rnd.nextInt(2)}")
    }
    val df   = rows.toDF("g", "x", "y", "z")
    val cAll = InfoTheory.cells(df, Seq("g", "x", "y", "z"))
    val cmi = InfoTheory.cmiPerGroup(cAll, "g", Seq("x"), Seq("y"), Seq("z"), "v", mm = true).collect()
      .map(r => r.getString(0) -> r.getDouble(1)).toMap
    for (g <- Seq("g0", "g1")) {
      val cg = InfoTheory.cells(df.where(s"g = '$g'"), Seq("x", "y", "z"))
      cmi(g) shouldBe InfoTheory.cmi(cg, Seq("x"), Seq("y"), Seq("z"), mm = true) +- Eps
    }
  }
}
