package repro.data

import scala.util.Random

import org.apache.spark.sql.{DataFrame, SparkSession}

/** The synthetic Covid-19 dataset: one row per country (n = 188, like the
  * paper). Deaths-per-100-cases is generated from the country latents mined
  * into the KG plus the in-table Confirmed count:
  *
  *   deaths = base + a·(1−hdi) + b·z(log confirmed) + c·gini + d·z(density)
  *            − e·z(pop) + noise
  *
  * so the Country↔Deaths correlation of Covid Q1 is explained by
  * {HDI/GDP-family, Confirmed}, and inside Europe (hdi ≈ const) by
  * {Gini, Density, Population, Confirmed} — matching Table 2.
  */
object CovidData {

  val DesignRows = 188L

  def facts(spark: SparkSession, seed: Long = 11L): DataFrame = {
    import spark.implicits._
    val rnd = new Random(seed)
    val cs  = CountryWorld.countries

    val densNorm = {
      val lds  = cs.map(c => math.log(c.density))
      val mean = lds.sum / lds.size
      val sd   = math.sqrt(lds.map(d => (d - mean) * (d - mean)).sum / lds.size)
      lds.map(d => (d - mean) / sd)
    }
    val testing   = cs.map(c => 0.6 * c.hdi + 0.4 * rnd.nextDouble())
    val confirmed = cs.indices.map { i =>
      math.exp(3.0 + 2.0 * testing(i) + 0.5 * densNorm(i) + rnd.nextGaussian() * 0.35) * 100
    }
    val confNorm = {
      val lcs  = confirmed.map(math.log)
      val mean = lcs.sum / lcs.size
      val sd   = math.sqrt(lcs.map(d => (d - mean) * (d - mean)).sum / lcs.size)
      lcs.map(d => (d - mean) / sd)
    }

    val rows = cs.indices.map { i =>
      val c = cs(i)
      val deaths = math.max(
        0.05,
        1.0 +
          8.0 * (1.0 - c.hdi) +
          1.6 * confNorm(i) +
          5.0 * (c.gini - 0.425) +
          0.9 * densNorm(i) -
          0.5 * (c.logPop - 16.25) / 3.25 +
          rnd.nextGaussian() * 0.5
      )
      val recovered = confirmed(i) * (0.5 + 0.4 * rnd.nextDouble())
      val active    = math.max(0.0, confirmed(i) - recovered)
      val newCases  = confirmed(i) * (0.02 + 0.1 * rnd.nextDouble())
      (c.surface, c.whoRegion, c.continent, confirmed(i), newCases, recovered, active, deaths)
    }
    rows.toDF(
      "Country", "WHO_Region", "Continent",
      "Confirmed", "New_cases", "Recovered", "Active", "Deaths_per_100"
    )
  }

  def bundle(spark: SparkSession): DatasetBundle =
    DatasetBundle(
      name = "Covid-19",
      facts = facts(spark),
      kg = CountryWorld.kg(spark),
      links = Seq(LinkSpec("Country", "", "kg:Country"), LinkSpec("Continent", "", "kg:Continent")),
      designRows = DesignRows
    )
}
