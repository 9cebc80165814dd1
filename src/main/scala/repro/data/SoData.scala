package repro.data

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** The synthetic Stack Overflow developer-survey dataset.
  *
  * Row = one developer. The salary model is the planted causal structure the
  * 14-query study relies on:
  *
  *   salary = base
  *          + HdiCoef  · (hdi − 0.4)          // economy (global driver)
  *          + GiniCoef · (0.6 − gini)         // inequality (global + Europe)
  *          − PopCoef(continent) · popNorm    // developer-supply effect;
  *                                            //   strongest in Europe
  *          + small Gender / DevType effects  // weak in-table attributes
  *          + noise
  *
  * Country→salary flows only through the latent attributes mined into the
  * KG, so conditioning on {HDI, Gini} (and within Europe on
  * {Gini, Population}) genuinely explains the Country↔Salary correlation.
  */
object SoData {

  val DesignRows = 47623L

  // --- planted effect sizes (tuned so MESA's selection matches Table 2) ---
  val BaseSalary = 40000.0
  val HdiCoef    = 90000.0
  val GiniCoef   = 95000.0
  /** Population effect per continent (salary drop per normalized log-pop). */
  val PopCoef: Map[String, Double] = Map(
    "Europe"        -> 16000.0,
    "Asia"          -> 4000.0,
    "North_America" -> 4000.0,
    "Africa"        -> 4000.0,
    "South_America" -> 3000.0,
    "Oceania"       -> 3000.0
  )
  val GenderBonus = 3000.0
  /** Per-country idiosyncratic salary offsets (local labor-market quirks not
    * captured by any KG attribute). Strong in the densely-sampled continents
    * — these are what makes their data groups "unexplained" in Table 4 even
    * under the optimal explanation, mirroring the paper's non-zero
    * explainability scores.
    */
  val OffsetSd: Map[String, Double] = Map(
    "Europe"        -> 2000.0,
    "Asia"          -> 3500.0,
    "North_America" -> 3500.0,
    "Africa"        -> 3500.0,
    "South_America" -> 800.0,
    "Oceania"       -> 800.0
  )
  /** Large within-country dispersion: salaries must span several outcome
    * bins per country, otherwise ANY partition of countries carries
    * spurious mutual information with the outcome.
    */
  val NoiseSd     = 13000.0

  private val Slots = 4096

  /** Developer fact table at scale factor `sf` (SF = 1 ≈ the paper's 47623). */
  def facts(spark: SparkSession, sf: Double, seed: Long = 7L): DataFrame = {
    import spark.implicits._
    val n = math.max(500L, (DesignRows * sf).toLong)

    // Weighted country sampling via a slot table (no UDFs, broadcast-free).
    val cs  = CountryWorld.countries
    val cum = cs.scanLeft(0.0)(_ + _.weight).tail
    val slotRows = (0 until Slots).map { s =>
      val u   = (s + 0.5) / Slots
      val idx = cum.indexWhere(_ >= u) match { case -1 => cs.size - 1; case i => i }
      (s, cs(idx).surface)
    }
    val slotsDf = slotRows.toDF("__slot", "Country")
    val offsetRnd = new scala.util.Random(977L)
    val offsetsDf = cs
      .map(c => (c.surface, offsetRnd.nextGaussian() * OffsetSd(c.continent)))
      .toDF("Country", "__offset")

    val popCoefExpr = PopCoef.foldLeft(lit(0.0)) { case (acc, (cont, coef)) =>
      when(col("Continent") === cont, lit(coef)).otherwise(acc)
    }

    // All randomness is drawn on range(n) BEFORE the joins: rand/randn are
    // seeded per partition, so drawing after a shuffle would make the facts
    // non-deterministic across Spark actions.
    spark.range(n)
      .select(
        (rand(seed) * Slots).cast("int").as("__slot"),
        when(rand(seed + 1) < 0.72, "Man").otherwise("Woman").as("Gender"),
        element_at(
          array(lit("BackEnd"), lit("FrontEnd"), lit("FullStack"), lit("Mobile"), lit("DataSci")),
          (rand(seed + 2) * 5 + 1).cast("int")
        ).as("DevType"),
        (rand(seed + 3) * 42 + 18).cast("int").as("Age"),
        when(rand(seed + 4) < 0.6, "Yes").otherwise("No").as("Hobby"),
        (rand(seed + 5) * 30).cast("int").as("YearsCode"),
        (randn(seed + 6) * NoiseSd).as("__noise"))
      .join(slotsDf, "__slot")
      .join(CountryWorld.latentsDf(spark), "Country")
      .join(offsetsDf, "Country")
      .withColumn("__devBonus",
        when(col("DevType") === "DataSci", 1500.0)
          .when(col("DevType") === "BackEnd", 700.0)
          .otherwise(0.0))
      .withColumn("Salary",
        greatest(
          lit(1000.0),
          lit(BaseSalary) +
            lit(HdiCoef) * (col("__hdi") - lit(0.4)) +
            lit(GiniCoef) * (lit(0.6) - col("__gini")) -
            popCoefExpr * ((col("__logPop") - lit(16.25)) / lit(3.25)) +
            when(col("Gender") === "Man", GenderBonus).otherwise(0.0) +
            col("__devBonus") +
            col("__offset") +
            col("__noise")
        ))
      .select("Country", "Continent", "Gender", "DevType", "Age", "Hobby", "YearsCode", "Salary")
  }

  def bundle(spark: SparkSession, sf: Double): DatasetBundle =
    DatasetBundle(
      name = "SO",
      facts = facts(spark, sf),
      kg = CountryWorld.kg(spark),
      links = Seq(LinkSpec("Country", "", "kg:Country"), LinkSpec("Continent", "", "kg:Continent")),
      designRows = DesignRows
    )
}
