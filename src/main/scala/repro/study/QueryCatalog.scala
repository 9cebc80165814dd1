package repro.study

import org.apache.spark.sql.SparkSession
import org.apache.spark.sql.functions._

import repro.core.{EntitySource, QueryTask}
import repro.data._

/** One of the 14 representative queries of Table 2, with its planted
  * ground-truth explanation.
  */
final case class StudyQuery(
    id: String,
    description: String,
    dataset: String,
    small: Boolean, // Brute-Force is feasible only on the small datasets
    task: QueryTask,
    truth: GroundTruth
)

/** The 14 representative queries of §5.1 (Table 2), built over the synthetic
  * datasets. Extraction runs once per dataset and the resulting sources are
  * shared by its queries.
  */
object QueryCatalog {

  // --- alias groups over the synthetic KG attribute names ---
  private val Economy = AliasGroup(
    "economy",
    Set("HDI", "HDI_Rank", "GDP", "GDP_Rank", "GDP_Nominal", "GDP_Per_Capita",
      "Cont_Avg_HDI", "Cont_Avg_GDP_Pc", "Established_Year")
  )
  private val Gini    = AliasGroup("gini", Set("Gini", "Gini_Rank"))
  private val Pop     = AliasGroup(
    "population",
    Set("Population_Census", "Population_Estimate", "Population_Rank", "Cont_Population")
  )
  private val DensityG = AliasGroup("density", Set("Density", "Area_Km", "Area_Rank", "Cont_Area"))
  private val ConfirmedG = AliasGroup("confirmed", Set("Confirmed", "New_cases", "Recovered", "Active"))

  private val Weather = AliasGroup(
    "weather",
    Set("Year_Low_F", "Year_Avg_F", "December_Low_F", "Record_Low_F", "Precipitation_Days",
      "May_Precipitation_Inch", "Year_Snow", "December_Percent_Sun", "Year_UV")
  )
  private val CityPop = AliasGroup(
    "city-population",
    Set("Population_Total", "Population_Urban", "Population_Metropolitan", "Population_Ranking", "City_Density")
  )
  private val StatePop    = AliasGroup("state-population", Set("Population_Estimation", "State_Population_Rank"))
  private val AnyPop      = AliasGroup("population", CityPop.members ++ StatePop.members)
  private val AirlineAttr = AliasGroup("airline", Set("Airline"))
  private val AirlineFin  = AliasGroup("airline-financials", Set("Fleet_Size", "Equity", "Revenue", "Num_Of_Employees"))
  private val Security    = AliasGroup("security-delay", Set("Security_Delay"))

  private val NetWorth = AliasGroup("net-worth", Set("Net_Worth"))
  private val GenderG  = AliasGroup("gender", Set("Gender"))
  private val AwardsG  = AliasGroup("awards", Set("Awards", "Honors"))
  private val CupsG    = AliasGroup("cups", Set("Cups_Total", "National_Cups"))
  private val DraftG   = AliasGroup("draft-pick", Set("Draft_Pick"))

  def soQueries(spark: SparkSession, sf: Double): Seq[StudyQuery] = {
    val bundle  = SoData.bundle(spark, sf)
    val sources = bundle.sources()
    val facts   = bundle.facts.cache()
    val tableAttrs = Seq("Gender", "DevType", "Age", "Hobby", "YearsCode")
    Seq(
      StudyQuery("SO Q1", "Average salary per country", "SO", small = false,
        QueryTask("SO Q1", facts, "Country", "Salary", tableAttrs, sources),
        GroundTruth(Seq(Economy, Gini.copy(weight = 0.8)), Seq(Pop, DensityG))),
      StudyQuery("SO Q2", "Average salary per continent", "SO", small = false,
        QueryTask("SO Q2", facts, "Continent", "Salary", tableAttrs, sources),
        GroundTruth(Seq(Economy), Seq(Gini, Pop, DensityG))),
      StudyQuery("SO Q3", "Average salary per country in Europe", "SO", small = false,
        QueryTask("SO Q3", facts.where(col("Continent") === "Europe"), "Country", "Salary",
          tableAttrs, sources, contextDesc = "Continent = Europe"),
        // Within Europe gdpPc is near-constant, so the GDP family is a
        // legitimate proxy for total population (GDP = gdpPc · pop).
        GroundTruth(
          Seq(Gini, Pop.copy(members = Pop.members ++ Set("GDP", "GDP_Nominal", "GDP_Rank"))),
          Seq(Economy, DensityG)))
    )
  }

  def covidQueries(spark: SparkSession): Seq[StudyQuery] = {
    val bundle  = CovidData.bundle(spark)
    val sources = bundle.sources()
    val facts   = bundle.facts.cache()
    val tableAttrs = Seq("Confirmed", "New_cases", "Recovered", "Active")
    Seq(
      StudyQuery("Covid Q1", "Deaths per country", "Covid-19", small = true,
        QueryTask("Covid Q1", facts, "Country", "Deaths_per_100", tableAttrs, sources),
        GroundTruth(Seq(Economy, ConfirmedG.copy(weight = 0.8)), Seq(Gini, DensityG, Pop))),
      StudyQuery("Covid Q2", "Deaths per country in Europe", "Covid-19", small = true,
        QueryTask("Covid Q2", facts.where(col("Continent") === "Europe"), "Country", "Deaths_per_100",
          tableAttrs, sources, contextDesc = "Continent = Europe"),
        GroundTruth(Seq(Gini, ConfirmedG.copy(weight = 0.8)), Seq(DensityG, Pop, Economy))),
      StudyQuery("Covid Q3", "Average deaths per WHO region", "Covid-19", small = true,
        QueryTask("Covid Q3", facts, "WHO_Region", "Deaths_per_100", tableAttrs, sources),
        GroundTruth(Seq(Economy), Seq(DensityG, ConfirmedG, Pop, Gini)))
    )
  }

  def flightsQueries(spark: SparkSession, sf: Double): Seq[StudyQuery] = {
    val bundle  = FlightsData.bundle(spark, sf)
    val sources = bundle.sources()
    val facts   = bundle.facts.cache()
    val base    = Seq("Day_Of_Week", "Month", "Distance", "Security_Delay", "Cancelled")
    val withAirline = base :+ "Airline"
    val q4Facts = facts.withColumn("State_Airline", concat_ws("__", col("Origin_State"), col("Airline")))
    Seq(
      StudyQuery("Flights Q1", "Average delay per origin city", "Flights", small = false,
        QueryTask("Flights Q1", facts, "Origin_City", "Departure_Delay", withAirline, sources),
        GroundTruth(Seq(Weather, CityPop.copy(weight = 0.8), AirlineAttr.copy(weight = 0.6)),
          Seq(StatePop, AirlineFin, Security))),
      StudyQuery("Flights Q2", "Average delay per origin state", "Flights", small = false,
        QueryTask("Flights Q2", facts, "Origin_State", "Departure_Delay", withAirline, sources),
        GroundTruth(Seq(Weather, AnyPop), Seq(AirlineAttr, AirlineFin, Security))),
      StudyQuery("Flights Q3", "Average delay per origin city in CA", "Flights", small = false,
        QueryTask("Flights Q3", facts.where(col("Origin_State") === "ST_CA"), "Origin_City",
          "Departure_Delay", withAirline, sources, contextDesc = "Origin_State = ST_CA"),
        GroundTruth(Seq(CityPop, Security.copy(weight = 0.5)), Seq(AirlineAttr, AirlineFin, Weather))),
      StudyQuery("Flights Q4", "Average delay per origin state and airline", "Flights", small = false,
        QueryTask("Flights Q4", q4Facts, "State_Airline", "Departure_Delay", base, sources),
        GroundTruth(Seq(AirlineFin, AnyPop.copy(weight = 0.8)), Seq(Weather, Security))),
      StudyQuery("Flights Q5", "Average delay per airline", "Flights", small = false,
        QueryTask("Flights Q5", facts, "Airline", "Departure_Delay", base, sources),
        GroundTruth(Seq(AirlineFin), Seq(Weather, CityPop, StatePop, Security)))
    )
  }

  def forbesQueries(spark: SparkSession): Seq[StudyQuery] = {
    val bundle  = ForbesData.bundle(spark)
    val sources = bundle.sources()
    val facts   = bundle.facts.cache()
    val tableAttrs = Seq("Year")
    def q(id: String, desc: String, category: String, truth: GroundTruth) =
      StudyQuery(id, desc, "Forbes", small = true,
        QueryTask(id, facts.where(col("Category") === category), "Name", "Pay", tableAttrs,
          sources, contextDesc = s"Category = $category"),
        truth)
    Seq(
      q("Forbes Q1", "Salary of actors", "Actors",
        GroundTruth(Seq(NetWorth, GenderG.copy(weight = 0.7)), Seq(AwardsG, AliasGroup("age", Set("Age", "Years_Active"))))),
      q("Forbes Q2", "Salary of directors/producers", "Directors_Producers",
        GroundTruth(Seq(NetWorth, AwardsG.copy(weight = 0.8)), Seq(GenderG))),
      q("Forbes Q3", "Salary of athletes", "Athletes",
        GroundTruth(Seq(CupsG, DraftG.copy(weight = 0.7)), Seq(NetWorth)))
    )
  }

  /** All 14 representative queries. */
  def all(spark: SparkSession, sfSo: Double, sfFlights: Double): Seq[StudyQuery] =
    soQueries(spark, sfSo) ++ flightsQueries(spark, sfFlights) ++
      covidQueries(spark) ++ forbesQueries(spark)
}
