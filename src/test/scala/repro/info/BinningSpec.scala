package repro.info

import org.scalatest.matchers.should.Matchers

import repro.SparkSpec

class BinningSpec extends SparkSpec with Matchers {

  import repro.SparkSpec.shared.implicits._

  test("numeric columns get equi-width bin labels b0..b{B-1}") {
    val df  = (0 to 100).map(_.toDouble).toDF("x")
    val out = Binning.binColumns(df, Seq("x"), bins = 4).collect().map(_.getString(0)).toSet
    out shouldBe Set("b0", "b1", "b2", "b3")
  }

  test("bin boundaries are correct for a known range") {
    val df   = Seq(0.0, 2.4, 2.6, 5.0, 7.6, 10.0).toDF("x")
    val bins = Binning.binColumns(df, Seq("x"), bins = 4).collect().map(_.getString(0)).toSeq
    // width 2.5: [0,2.5)=b0 [2.5,5)=b1 [5,7.5)=b2 [7.5,10]=b3 (max clipped)
    bins shouldBe Seq("b0", "b0", "b1", "b2", "b3", "b3")
  }

  test("nulls and NaNs stay null") {
    val df  = Seq(Some(1.0), None, Some(Double.NaN), Some(2.0)).toDF("x")
    val out = Binning.binColumns(df, Seq("x"), 4).collect().map(r => Option(r.getString(0)))
    out.count(_.isEmpty) shouldBe 2
  }

  test("a constant numeric column becomes a single bin") {
    val df  = Seq.fill(5)(3.14).toDF("x")
    val out = Binning.binColumns(df, Seq("x"), 8).collect().map(_.getString(0)).toSet
    out shouldBe Set("b0")
  }

  test("categorical columns are cast to string unchanged") {
    val df  = Seq("alpha", "beta").toDF("x")
    val out = Binning.binColumns(df, Seq("x"), 8).collect().map(_.getString(0)).toSet
    out shouldBe Set("alpha", "beta")
  }

  test("integer columns are binned numerically") {
    val df  = (1 to 80).toDF("x")
    val out = Binning.binColumns(df, Seq("x"), 8).collect().map(_.getString(0)).distinct
    out.size shouldBe 8
  }

  test("multiple columns are binned in one pass, non-listed columns untouched") {
    val df  = Seq((1.0, 10.0, "keep"), (2.0, 20.0, "keep")).toDF("a", "b", "c")
    val out = Binning.binColumns(df, Seq("a", "b"), 2)
    out.columns.toSeq shouldBe Seq("a", "b", "c")
    out.schema("c").dataType.typeName shouldBe "string"
    out.select("a").collect().map(_.getString(0)).toSet shouldBe Set("b0", "b1")
  }

  test("binExpr clips out-of-range values into the edge bins") {
    val df = Seq(-5.0, 0.0, 10.0, 15.0).toDF("x")
    import org.apache.spark.sql.functions.col
    val out = df.select(Binning.binExpr(col("x"), 0.0, 10.0, 4).as("b")).collect().map(_.getString(0))
    out shouldBe Array("b0", "b0", "b3", "b3")
  }

  test("unknown column names are rejected") {
    val df = Seq(1.0).toDF("x")
    an[IllegalArgumentException] should be thrownBy Binning.binColumns(df, Seq("nope"), 4)
  }
}
