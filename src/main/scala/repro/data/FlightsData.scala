package repro.data

import scala.util.Random

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

import repro.kg.KnowledgeGraph

/** The synthetic Flights-Delay dataset (the paper's 5.8M-row scale test).
  *
  * Three entity families back the KG: origin/destination cities (weather and
  * population attribute families), states (population/income), and airlines
  * (fleet/financial attributes). The departure-delay model is
  *
  *   delay = a·weatherBadness(origin) + b·congestion(origin city pop)
  *         + c·sloppiness(airline) + winter interaction + noise
  *
  * with airline choice biased toward hub regions, so Airline genuinely
  * confounds the per-city and per-state queries (Table 2 Flights Q1/Q2), and
  * sloppiness a function of fleet size and equity, so {Equity, Fleet_Size}
  * explain the per-airline query (Q5). California cities share near-constant
  * weather, which is what pushes Q3 toward density/population + the in-table
  * Security_Delay.
  */
object FlightsData {

  val DesignRows = 5819079L
  val Seed       = 31L

  final case class City(
      name: String, state: String, region: String,
      latFactor: Double, badWeather: Double, logPop: Double, congestion: Double, weight: Double
  )
  final case class Airline(name: String, hubRegion: String, fleet: Double, equity: Double, sloppiness: Double)

  private val Regions = Seq("West", "South", "Midwest", "Northeast")

  lazy val (cities: Seq[City], stateRegions: Map[String, String]) = {
    val rnd    = new Random(Seed)
    val states = ("ST_CA" -> "West") +: (1 to 39).map(i => f"ST_$i%02d" -> Regions(rnd.nextInt(4)))
    val cs = states.flatMap { case (st, region) =>
      val n = if (st == "ST_CA") 25 else 4 + rnd.nextInt(5)
      (1 to n).map { i =>
        // CA: mild, near-constant weather (the Q3 design point).
        val latFactor =
          if (st == "ST_CA") 0.75 + rnd.nextGaussian() * 0.02
          else region match {
            case "West"      => 0.55 + (rnd.nextDouble() - 0.5) * 0.4
            case "South"     => 0.70 + (rnd.nextDouble() - 0.5) * 0.3
            case "Midwest"   => 0.35 + (rnd.nextDouble() - 0.5) * 0.3
            case _           => 0.30 + (rnd.nextDouble() - 0.5) * 0.2
          }
        val badWeather = math.min(1.0, math.max(0.0, (1 - latFactor) + rnd.nextGaussian() * 0.05))
        val logPop     = 10.5 + rnd.nextDouble() * 5.5
        City(f"City_${st}_$i%02d", st, region, latFactor, badWeather, logPop,
          (logPop - 13.25) / 2.75, math.exp(logPop / 2.2))
      }
    }
    val wSum = cs.map(_.weight).sum
    (cs.map(c => c.copy(weight = c.weight / wSum)), states.toMap)
  }

  lazy val airlines: Seq[Airline] = {
    val rnd = new Random(Seed + 1)
    (1 to 14).map { i =>
      val fleet  = math.exp(3.5 + rnd.nextDouble() * 3.5)
      val equity = fleet * (8 + rnd.nextGaussian() * 1.5) // strongly tied to fleet
      val zF     = (math.log(fleet) - 5.25) / 1.75
      val zE     = (math.log(math.max(equity, 1.0)) - 7.3) / 1.8
      val slop   = math.max(0.0, 0.8 - 0.35 * (zF + zE) / 2 + rnd.nextGaussian() * 0.06)
      Airline(f"Airline_$i%02d", Regions(rnd.nextInt(4)), fleet, equity, slop)
    }
  }

  private val CitySlots = 4096
  private val AirSlots  = 256

  /** Flight fact table at scale factor `sf` (SF = 1 ≈ 5.8M rows). */
  def facts(spark: SparkSession, sf: Double, seed: Long = Seed + 2): DataFrame = {
    import spark.implicits._
    val n = math.max(2000L, (DesignRows * sf).toLong)

    val cum = cities.scanLeft(0.0)(_ + _.weight).tail
    val citySlotRows = (0 until CitySlots).map { s =>
      val u   = (s + 0.5) / CitySlots
      val idx = cum.indexWhere(_ >= u) match { case -1 => cities.size - 1; case i => i }
      val c   = cities(idx)
      (s, c.name, c.state, c.region, c.badWeather, c.congestion)
    }
    val originSlots = citySlotRows
      .toDF("__cslot", "Origin_City", "Origin_State", "__region", "__badW", "__cong")
    val destSlots = citySlotRows
      .map(r => (r._1, r._2))
      .toDF("__dslot", "Dest_City")

    // Region-biased airline mix: hub airlines 3x more likely in their region.
    val airlineSlots = Regions.flatMap { region =>
      val weights = airlines.map(a => if (a.hubRegion == region) 3.0 else 1.0)
      val wSum    = weights.sum
      val cumA    = weights.scanLeft(0.0)(_ + _).tail.map(_ / wSum)
      (0 until AirSlots).map { s =>
        val u   = (s + 0.5) / AirSlots
        val idx = cumA.indexWhere(_ >= u) match { case -1 => airlines.size - 1; case i => i }
        (region, s, airlines(idx).name)
      }
    }.toDF("__region", "__aslot", "Airline")
    val airlineLatents = airlines.map(a => (a.name, a.sloppiness)).toDF("Airline", "__slop")

    // All randomness is drawn on range(n) BEFORE the joins (rand/randn are
    // per-partition seeded; post-shuffle draws would be non-deterministic).
    spark.range(n)
      .select(
        (rand(seed) * CitySlots).cast("int").as("__cslot"),
        (rand(seed + 1) * CitySlots).cast("int").as("__dslot"),
        (rand(seed + 2) * AirSlots).cast("int").as("__aslot"),
        (rand(seed + 3) * 7 + 1).cast("int").as("Day_Of_Week"),
        (rand(seed + 4) * 12 + 1).cast("int").as("Month"),
        (rand(seed + 5) * 2400 + 100).cast("int").as("Distance"),
        (randn(seed + 6) * 1.5).as("__secNoise"),
        when(rand(seed + 7) < 0.015, 1).otherwise(0).as("Cancelled"),
        (randn(seed + 8) * 12.0).as("__delayNoise")
      )
      .join(originSlots, "__cslot")
      .join(destSlots, "__dslot")
      .join(airlineSlots, Seq("__region", "__aslot"))
      .join(airlineLatents, "Airline")
      .withColumn("__winter", when(col("Month").isin(12, 1, 2), 1.0).otherwise(0.0))
      .withColumn("Security_Delay",
        greatest(lit(0.0), lit(1.5) + col("__cong") * 3.0 + col("__secNoise")))
      .withColumn("Departure_Delay",
        lit(-5.0) +
          col("__badW") * 25.0 +
          col("__cong") * 10.0 +
          col("__slop") * 14.0 +
          col("__winter") * col("__badW") * 5.0 +
          col("__delayNoise"))
      .select(
        "Origin_City", "Origin_State", "Dest_City", "Airline",
        "Day_Of_Week", "Month", "Distance", "Security_Delay", "Cancelled", "Departure_Delay"
      )
  }

  /** The KG over cities, states, and airlines. */
  def kg(spark: SparkSession): KnowledgeGraph = {
    val rnd     = new Random(Seed + 3)
    val triples = Seq.newBuilder[Triple]
    val labels  = Seq.newBuilder[(String, String)]

    val popRank = KgBuilder.ranks(cities.map(_.logPop))
    val cityNoiseNum = (1 to 170).map(j => (f"City_Noise_Num_$j%03d", 0.3 + rnd.nextDouble() * 0.6, j % 9 == 0))
    val cityNoiseCat = (1 to 60).map(j => (f"City_Noise_Cat_$j%03d", 0.35 + rnd.nextDouble() * 0.55, 3 + rnd.nextInt(3)))

    cities.zipWithIndex.foreach { case (c, ci) =>
      val e = c.name
      labels += (e -> e)
      def maybe(p: Double)(t: => Triple): Unit = if (rnd.nextDouble() < p) triples += t
      val lf  = c.latFactor
      val pop = math.exp(c.logPop)
      maybe(0.90)(Triple.num(e, "Year_Low_F", 5 + 50 * lf + rnd.nextGaussian() * 2))
      maybe(0.88)(Triple.num(e, "Year_Avg_F", 35 + 40 * lf + rnd.nextGaussian() * 2))
      maybe(0.85)(Triple.num(e, "December_Low_F", 50 * lf - 10 + rnd.nextGaussian() * 2))
      maybe(0.80)(Triple.num(e, "Record_Low_F", 50 * lf - 35 + rnd.nextGaussian() * 3))
      maybe(0.88)(Triple.num(e, "Precipitation_Days", 60 + 110 * c.badWeather + rnd.nextGaussian() * 6))
      maybe(0.80)(Triple.num(e, "May_Precipitation_Inch", 1 + 7 * c.badWeather + rnd.nextGaussian() * 0.5))
      maybe(0.85)(Triple.num(e, "Year_Snow", math.max(0, 70 * c.badWeather - 15 + rnd.nextGaussian() * 4)))
      maybe(0.82)(Triple.num(e, "December_Percent_Sun", 25 + 55 * lf + rnd.nextGaussian() * 4))
      maybe(0.78)(Triple.num(e, "Year_UV", 2 + 8 * lf + rnd.nextGaussian() * 0.5))
      maybe(0.92)(Triple.num(e, "Population_Total", pop))
      maybe(0.85)(Triple.num(e, "Population_Urban", pop * (0.5 + rnd.nextDouble() * 0.4)))
      maybe(0.82)(Triple.num(e, "Population_Metropolitan", pop * (1.0 + rnd.nextDouble() * 1.5)))
      maybe(0.85)(Triple.num(e, "Population_Ranking", popRank(ci).toDouble))
      maybe(0.85)(Triple.num(e, "City_Density", pop / math.exp(4 + rnd.nextDouble() * 3)))
      triples += Triple.str(e, "City_Type", "City")
      triples += Triple.str(e, "City_WikiID", s"QC${10000 + ci}")
      cityNoiseNum.foreach { case (name, present, biased) =>
        val p = if (biased) (if (c.logPop >= 13.25) 0.85 else 0.35) else present
        maybe(p)(Triple.num(e, name, rnd.nextDouble() * 100))
      }
      cityNoiseCat.foreach { case (name, present, levels) =>
        maybe(present)(Triple.str(e, name, s"v${rnd.nextInt(levels)}"))
      }
    }

    val statePops = cities.groupBy(_.state).map { case (st, cs) => st -> cs.map(c => math.exp(c.logPop)).sum }
    val stRank    = KgBuilder.ranks(statePops.values.toSeq)
    val stNames   = statePops.keys.toSeq
    val stateNoise = (1 to 95).map(j => (f"State_Noise_Num_$j%03d", 0.35 + rnd.nextDouble() * 0.55))
    stNames.zipWithIndex.foreach { case (st, si) =>
      labels += (st -> st)
      def maybe(p: Double)(t: => Triple): Unit = if (rnd.nextDouble() < p) triples += t
      maybe(0.92)(Triple.num(st, "Population_Estimation", statePops(st) * (1 + rnd.nextGaussian() * 0.03)))
      maybe(0.85)(Triple.num(st, "State_Population_Rank", stRank(si).toDouble))
      maybe(0.85)(Triple.num(st, "Median_Household_Income", 40000 + rnd.nextDouble() * 40000))
      maybe(0.85)(Triple.num(st, "State_Area", math.exp(10 + rnd.nextDouble() * 3)))
      stateNoise.foreach { case (name, present) => maybe(present)(Triple.num(st, name, rnd.nextDouble())) }
    }

    val airNoise = (1 to 38).map(j => (f"Airline_Noise_Num_$j%02d", 0.4 + rnd.nextDouble() * 0.5))
    airlines.foreach { a =>
      labels += (a.name -> a.name)
      def maybe(p: Double)(t: => Triple): Unit = if (rnd.nextDouble() < p) triples += t
      maybe(0.95)(Triple.num(a.name, "Fleet_Size", a.fleet))
      maybe(0.92)(Triple.num(a.name, "Equity", a.equity))
      maybe(0.90)(Triple.num(a.name, "Revenue", a.equity * (0.5 + rnd.nextDouble())))
      maybe(0.88)(Triple.num(a.name, "Num_Of_Employees", a.fleet * (20 + rnd.nextDouble() * 20)))
      maybe(0.80)(Triple.num(a.name, "Founded_Year", 1930 + rnd.nextDouble() * 80))
      airNoise.foreach { case (name, present) => maybe(present)(Triple.num(a.name, name, rnd.nextDouble())) }
    }

    KgBuilder.build(spark, triples.result(), labels.result())
  }

  def bundle(spark: SparkSession, sf: Double): DatasetBundle =
    DatasetBundle(
      name = "Flights",
      facts = facts(spark, sf),
      kg = kg(spark),
      links = Seq(
        LinkSpec("Origin_City", "", "kg:OriginCity"),
        LinkSpec("Dest_City", "Dest_", "kg:DestCity"),
        LinkSpec("Origin_State", "", "kg:State"),
        LinkSpec("Airline", "", "kg:Airline")
      ),
      designRows = DesignRows
    )
}
