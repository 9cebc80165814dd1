package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** Hand-built planted task shared by the core test suites.
  *
  * 48 "shops" carry a *discrete* driver `good` (6 levels — exact under
  * binning, so O is conditionally pure noise given `good` and conditional
  * independence holds exactly), a near-copy `good_copy`, pure noise `irrel`,
  * a half-missing copy `halfmiss`, a constant `const_attr`, a unique
  * `shop_code` (1:1 with T), plus one in-table candidate `channel` with a
  * small planted effect:
  *
  *   o = 10·good(shop) + 2·[channel = web] + N(0, 3).
  */
object Fixtures {

  val NShops = 48
  val Levels = 6

  def goodOf(i: Int): Double = (i % Levels) * 2.0

  def entityTable(spark: SparkSession): DataFrame = {
    import spark.implicits._
    val rnd = new scala.util.Random(99)
    (0 until NShops).map { i =>
      (
        f"S$i%02d",
        goodOf(i),                                   // good (discrete levels)
        goodOf(i) + rnd.nextGaussian() * 0.05,       // good_copy (redundant alias)
        rnd.nextDouble() * 100,                      // irrel
        if (i % 2 == 0) Some(goodOf(i)) else None,   // halfmiss
        "shop",                                      // const_attr
        f"CODE_$i%02d"                               // shop_code: 1:1 with T
      )
    }.toDF("shop", "good", "good_copy", "irrel", "halfmiss", "const_attr", "shop_code")
  }

  def source(spark: SparkSession): EntitySource =
    EntitySource(
      "shops", "shop", entityTable(spark),
      Seq("good", "good_copy", "irrel", "halfmiss", "const_attr", "shop_code")
    )

  def facts(spark: SparkSession, n: Int = 6000, seed: Long = 5L): DataFrame = {
    import spark.implicits._
    val latents = (0 until NShops).map(i => (f"S$i%02d", goodOf(i))).toDF("shop", "__good")
    // All randomness is drawn on range(n) BEFORE the join: rand/randn are
    // seeded per partition, so drawing after a shuffle would make the data
    // non-deterministic across Spark actions.
    spark.range(n)
      .select(
        concat(lit("S"), lpad((rand(seed) * NShops).cast("int").cast("string"), 2, "0")).as("shop"),
        when(rand(seed + 1) < 0.5, "web").otherwise("store").as("channel"),
        (randn(seed + 2) * 3.0).as("__noise"))
      .join(latents, "shop")
      .withColumn("o",
        col("__good") * 10.0 +
          when(col("channel") === "web", 2.0).otherwise(0.0) +
          col("__noise"))
      .select("shop", "channel", "o")
  }

  def task(spark: SparkSession, n: Int = 6000): QueryTask =
    QueryTask("shops-task", facts(spark, n), t = "shop", o = "o",
      tableAttrs = Seq("channel"), sources = Seq(source(spark)))

  def cfg: MesaConfig = MesaConfig(bins = 6)
}
