package repro.data

import scala.util.Random

import org.apache.spark.sql.{DataFrame, SparkSession}

import repro.kg.KnowledgeGraph

/** The synthetic country world shared by the SO and Covid-19 datasets: 188
  * countries with latent socio-economic state, a DBpedia-like KG over them
  * (signal attributes, rank/noisy aliases, irrelevant noise, constants, IDs,
  * heavy-missing attributes, entity links for 2-hop extraction), and the
  * entity-linking quirks of the paper's appendix (aliases, unlinkable and
  * ambiguous surface forms).
  *
  * Causal latents (all downstream outcome models read these):
  *  - `hdi`: continent-banded; the Europe band is very narrow — this is what
  *    makes {HDI, Gini} insufficient inside Europe (Table 4 / SO Q3).
  *  - `gini`: uniform within every continent.
  *  - `logPop`: wide spread everywhere; its salary effect is strongest in
  *    Europe (developed-market oversupply effect).
  *  - `gdpPc`: a noisy monotone function of `hdi` (the economy alias family).
  */
object CountryWorld {

  final case class Country(
      entity: String,     // KG entity id (= canonical label)
      surface: String,    // the value appearing in fact tables
      linked: Boolean,    // whether the linker can resolve surface -> entity
      continent: String,
      whoRegion: String,
      hdi: Double,
      gini: Double,
      logPop: Double,
      pop: Double,
      areaKm: Double,
      density: Double,
      gdpPc: Double,
      gdp: Double,
      currency: String,
      language: String,
      weight: Double // sampling weight of the country in the SO facts
  )

  /** (continent, WHO region, #countries, hdi base, hdi half-spread, fact share) */
  private val Continents = Seq(
    ("Europe", "EURO", 48, 0.895, 0.015, 0.30),
    ("Asia", "SEARO", 45, 0.70, 0.08, 0.28),
    ("North_America", "AMRO", 20, 0.84, 0.05, 0.20),
    ("Africa", "AFRO", 50, 0.55, 0.07, 0.12),
    ("South_America", "AMRO", 13, 0.72, 0.05, 0.06),
    ("Oceania", "WPRO", 12, 0.78, 0.07, 0.04)
  )

  val Seed = 20230142L

  lazy val countries: Seq[Country] = {
    val rnd = new Random(Seed)
    val out = for {
      (cont, who, n, hdiBase, hdiSpread, share) <- Continents
      i <- 1 to n
    } yield {
      val entity  = f"${cont}_Country_$i%02d"
      val hdi     = hdiBase + (rnd.nextDouble() * 2 - 1) * hdiSpread
      val gini    = 0.25 + rnd.nextDouble() * 0.35
      val logPop  = 13.0 + rnd.nextDouble() * 6.5
      val pop     = math.exp(logPop)
      val areaKm  = math.exp(9.2 + rnd.nextDouble() * 5.3)
      val gdpPc   = math.exp(6.5 + 4.0 * (hdi - 0.5) + rnd.nextGaussian() * 0.3)
      // Currencies are regional (a few zones per continent, Euro for most of
      // Europe) — per-country currencies would act as country identifiers.
      val euro    = cont == "Europe" && rnd.nextDouble() < 0.60
      // Non-Euro currency zones cut across continents (like USD/XOF do), so
      // Currency is not a continent classifier in disguise.
      val currency = if (euro) "Euro" else s"CUR_${rnd.nextInt(8)}"
      val language = s"Lang_${rnd.nextInt(12)}"
      // Entity-linking quirks (appendix): aliases and unlinkable surfaces.
      val (surface, linked) = (cont, i) match {
        case ("Asia", 1) | ("Asia", 2)     => (s"${entity}_Federation", true)  // resolved via alias
        case ("Africa", 3) | ("Africa", 4) => (s"${entity}_Rep", false)        // no alias registered
        case ("Oceania", 1)                => ("Borduria", false)              // ambiguous label
        case _                             => (entity, true)
      }
      val weight = share / n * (0.5 + rnd.nextDouble() * 1.3)
      Country(entity, surface, linked, cont, who, hdi, gini, logPop, pop, areaKm, pop / areaKm,
        gdpPc, gdpPc * pop, currency, language, weight)
    }
    val wSum = out.map(_.weight).sum
    out.map(c => c.copy(weight = c.weight / wSum))
  }

  /** Number of irrelevant attributes planted in the KG, chosen so that the
    * extracted attribute count lands near Table 1 (|E| ≈ 461/463).
    */
  private val NumNoiseNum = 250
  private val NumNoiseCat = 160
  private val NumHeavy    = 30

  /** The DBpedia substitute over the country world. */
  def kg(spark: SparkSession): KnowledgeGraph = {
    val rnd = new Random(Seed + 1)
    val cs  = countries
    val hdiRank  = KgBuilder.ranks(cs.map(_.hdi))
    val giniRank = KgBuilder.ranks(cs.map(_.gini))
    val gdpRank  = KgBuilder.ranks(cs.map(_.gdp))
    val popRank  = KgBuilder.ranks(cs.map(_.pop))
    val areaRank = KgBuilder.ranks(cs.map(_.areaKm))

    val triples = Seq.newBuilder[Triple]
    val labels  = Seq.newBuilder[(String, String)]

    // Per-noise-prop configuration, fixed across entities. Noise attributes
    // come in correlated families (like DBpedia's many variants of the same
    // real-world quantity): 40 latent factors per country, each noise
    // attribute a noisy copy of one factor.
    // A small number of truly independent latent factors: real KGs carry
    // many correlated variants of few underlying quantities, and each
    // independent factor is one more lottery ticket for the
    // arbitrary-partition artifact.
    val NumNoiseFactors = 12
    val noiseFactors = Array.fill(cs.size, NumNoiseFactors)(rnd.nextDouble() * 100)
    val noiseNumCfg = (1 to NumNoiseNum).map { j =>
      // Decent coverage: an irrelevant attribute present for only a handful
      // of entities degenerates into an entity identifier on context-refined
      // queries (its tiny complete-case pool is fully "explained" by any
      // partition of it).
      val present = 0.55 + rnd.nextDouble() * 0.40
      val hdiDependent = j % 8 == 0 // planted, detectable selection bias
      (f"Noise_Num_$j%03d", present, hdiDependent, j % NumNoiseFactors)
    }
    val noiseCatCfg = (1 to NumNoiseCat).map { j =>
      val present = 0.55 + rnd.nextDouble() * 0.40
      // Few levels, like real KG categorical facts: a high-cardinality
      // category over a small entity pool would act as an entity identifier.
      val levels  = 3 + rnd.nextInt(3)
      (f"Noise_Cat_$j%03d", present, levels, j % NumNoiseFactors)
    }
    val heavyCfg = (1 to NumHeavy).map(j => (f"Heavy_$j%03d", 0.02 + rnd.nextDouble() * 0.04))

    cs.zipWithIndex.foreach { case (c, ci) =>
      val e = c.entity
      labels += (e -> e)
      def maybe(p: Double)(t: => Triple): Unit = if (rnd.nextDouble() < p) triples += t

      maybe(0.93)(Triple.num(e, "HDI", c.hdi))
      maybe(0.88)(Triple.num(e, "HDI_Rank", hdiRank(ci).toDouble))
      maybe(0.92)(Triple.num(e, "Gini", c.gini))
      maybe(0.85)(Triple.num(e, "Gini_Rank", giniRank(ci).toDouble))
      maybe(0.90)(Triple.num(e, "GDP", c.gdp))
      maybe(0.88)(Triple.num(e, "GDP_Rank", gdpRank(ci).toDouble))
      maybe(0.85)(Triple.num(e, "GDP_Per_Capita", c.gdpPc))
      // GDP_Nominal: missing mostly in poor countries — the planted,
      // detectable selection bias of §3.2 on a signal attribute.
      maybe(if (c.hdi >= 0.70) 0.92 else 0.45)(
        Triple.num(e, "GDP_Nominal", c.gdp * (1 + rnd.nextGaussian() * 0.05))
      )
      maybe(0.95)(Triple.num(e, "Population_Census", c.pop * (1 + rnd.nextGaussian() * 0.01)))
      maybe(0.88)(Triple.num(e, "Population_Estimate", c.pop * (1 + rnd.nextGaussian() * 0.05)))
      maybe(0.87)(Triple.num(e, "Population_Rank", popRank(ci).toDouble))
      maybe(0.90)(Triple.num(e, "Density", c.density))
      maybe(0.94)(Triple.num(e, "Area_Km", c.areaKm))
      maybe(0.88)(Triple.num(e, "Area_Rank", areaRank(ci).toDouble))
      maybe(if (c.hdi >= 0.70) 0.85 else 0.55)(
        Triple.num(e, "Established_Year", 1200 + rnd.nextDouble() * 800)
      )
      maybe(0.95)(Triple.str(e, "Currency", c.currency))
      maybe(0.90)(Triple.str(e, "Language", c.language))
      // Time zones are regional (a handful per continent), not per-country.
      maybe(0.85)(Triple.str(e, "Time_Zone", s"UTC_${rnd.nextInt(13)}"))
      triples += Triple.str(e, "Type", "Country")        // constant → offline prune
      triples += Triple.str(e, "WikiID", s"Q${900000 + ci}") // unique id → offline prune

      noiseNumCfg.foreach { case (name, present, hdiDep, factor) =>
        val p = if (hdiDep) (if (c.hdi >= 0.70) 0.9 else 0.45) else present
        maybe(p)(Triple.num(e, name, noiseFactors(ci)(factor) + rnd.nextGaussian() * 6))
      }
      noiseCatCfg.foreach { case (name, present, levels, factor) =>
        // Categorical noise is a bucketing of the same latent factors.
        val bucket = ((noiseFactors(ci)(factor) / 100.0 * levels).toInt + rnd.nextInt(2)) % levels
        maybe(present)(Triple.str(e, name, s"v$bucket"))
      }
      heavyCfg.foreach { case (name, present) =>
        maybe(present)(Triple.num(e, name, rnd.nextDouble()))
      }

      // Entity links for multi-hop extraction (§3.1): leader + ethnic groups.
      val leader = s"Leader_of_$e"
      if (rnd.nextDouble() < 0.9) {
        triples += Triple.ref(e, "Leader", leader)
        triples += Triple.num(leader, "Age", 30 + rnd.nextInt(50))
        triples += Triple.str(leader, "Gender", if (rnd.nextDouble() < 0.8) "M" else "F")
        labels += (leader -> leader)
      }
      val nGroups = 2 + rnd.nextInt(3)
      (1 to nGroups).foreach { g =>
        val grp = s"Ethnic_${e}_$g"
        if (rnd.nextDouble() < 0.8) {
          triples += Triple.ref(e, "Ethnic_Group", grp)
          triples += Triple.num(grp, "Population_Size", c.pop * rnd.nextDouble() / nGroups)
          labels += (grp -> grp)
        }
      }
    }

    // Alias registrations: "<X>_Federation" resolves; "Borduria" is ambiguous
    // (registered as the label of two different entities).
    cs.filter(c => c.surface.endsWith("_Federation")).foreach(c => labels += (c.entity -> c.surface))
    labels += ("Oceania_Country_01" -> "Borduria")
    labels += ("Oceania_Country_02" -> "Borduria")

    // Continent entities (SO/Covid extract from the Continent / WHO-Region
    // columns too, per Table 1).
    Continents.foreach { case (cont, _, n, hdiBase, _, _) =>
      labels += (cont -> cont)
      val inCont = cs.filter(_.continent == cont)
      // Only semantically meaningful continent descriptors: with six
      // entities, ANY continent-level attribute (noise included) would be a
      // continent identifier in disguise and degenerate into a perfect
      // "explanation".
      triples += Triple.num(cont, "Cont_Avg_HDI", hdiBase)
      triples += Triple.num(cont, "Cont_Population", inCont.map(_.pop).sum)
      triples += Triple.num(cont, "Cont_Area", inCont.map(_.areaKm).sum)
      triples += Triple.num(cont, "Cont_Avg_GDP_Pc", inCont.map(_.gdpPc).sum / n)
    }

    KgBuilder.build(spark, triples.result(), labels.result())
  }

  /** Driver-built latent table keyed by the fact-side surface name — the
    * generative inputs for the SO / Covid outcome models.
    */
  def latentsDf(spark: SparkSession): DataFrame = {
    import spark.implicits._
    countries
      .map(c => (c.surface, c.continent, c.whoRegion, c.hdi, c.gini, c.logPop, c.density, c.areaKm, c.currency, c.weight))
      .toDF("Country", "Continent", "WHO_Region", "__hdi", "__gini", "__logPop", "__density", "__areaKm", "__currency", "__weight")
  }
}
