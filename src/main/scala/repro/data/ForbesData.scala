package repro.data

import scala.util.Random

import org.apache.spark.sql.{DataFrame, SparkSession}

import repro.kg.KnowledgeGraph

/** The synthetic Forbes celebrity-earnings dataset: 150 celebrities × ~11
  * years ≈ the paper's 1647 rows. Pay is generated per category from the
  * person attributes mined into the KG:
  *
  *  - Actors:              net worth + gender pay gap
  *  - Directors_Producers: net worth + awards
  *  - Athletes:            cups + draft pick
  *
  * DBpedia describes each celebrity category with different attributes, so
  * category-specific attributes are structurally missing for the other
  * categories — reproducing the paper's 73% missing rate and its
  * category-correlated selection bias. Documentation quality also scales
  * with fame (missingness depends on net worth — detectable bias). One
  * athlete's surface form, "Ronaldo", is ambiguous and fails to link.
  */
object ForbesData {

  val DesignRows = 1647L
  val Seed       = 53L

  final case class Person(
      entity: String, surface: String, category: String, fame: Double,
      netWorth: Double, male: Boolean, awards: Int, cups: Int, draftPick: Int
  )

  private val Categories =
    Seq(("Actors", 40), ("Athletes", 40), ("Directors_Producers", 30), ("Musicians", 25), ("Authors", 15))

  lazy val persons: Seq[Person] = {
    val rnd = new Random(Seed)
    Categories.flatMap { case (cat, n) =>
      (1 to n).map { i =>
        val entity    = f"${cat}_Person_$i%02d"
        val fame      = rnd.nextDouble()
        val netWorth  = math.exp(1.5 + 3.0 * fame + rnd.nextGaussian() * 0.3)
        val male      = rnd.nextDouble() < 0.7
        val awards    = math.max(0, (fame * 8 + rnd.nextGaussian() * 1.2).round.toInt)
        val cups      = math.max(0, (fame * 10 + rnd.nextGaussian() * 1.0).round.toInt)
        val draftPick = math.max(1, (1 + 50 * (1 - fame) + rnd.nextGaussian() * 4).round.toInt)
        val surface   = if (cat == "Athletes" && i == 1) "Ronaldo" else entity
        Person(entity, surface, cat, fame, netWorth, male, awards, cups, draftPick)
      }
    }
  }

  def facts(spark: SparkSession, seed: Long = Seed + 1): DataFrame = {
    import spark.implicits._
    val rnd = new Random(seed)
    val rows = for {
      p    <- persons
      year <- 2005 to 2015
      if rnd.nextDouble() < 0.995 // a few missing person-years, like the real data
    } yield {
      val lnw = math.log(p.netWorth)
      val base = p.category match {
        case "Actors"              => 5 + 9 * (lnw - 1.5) / 3 + (if (p.male) 4.0 else 0.0)
        case "Directors_Producers" => 4 + 7 * (lnw - 1.5) / 3 + 0.6 * p.awards
        case "Athletes"            => 6 + 1.1 * p.cups + 0.12 * (55 - p.draftPick)
        case "Musicians"           => 5 + 8 * p.fame
        case _                     => 2 + 4 * p.fame
      }
      val pay = math.max(0.5, base * (0.85 + rnd.nextDouble() * 0.3) + rnd.nextGaussian() * 1.5)
      (p.surface, year, p.category, pay)
    }
    rows.toDF("Name", "Year", "Category", "Pay")
  }

  def kg(spark: SparkSession): KnowledgeGraph = {
    val rnd     = new Random(Seed + 2)
    val triples = Seq.newBuilder[Triple]
    val labels  = Seq.newBuilder[(String, String)]

    // Noise attributes present only for a random subset of categories (and
    // better documented for famous people) → ~73% average missingness with
    // structure the bias detector can find.
    val noiseNumCfg = (1 to 420).map { j =>
      val cats = Categories.map(_._1).filter(_ => rnd.nextDouble() < 0.4).toSet
      (f"Person_Noise_Num_$j%03d", cats, j % 7 == 0)
    }
    val noiseCatCfg = (1 to 200).map { j =>
      val cats = Categories.map(_._1).filter(_ => rnd.nextDouble() < 0.4).toSet
      (f"Person_Noise_Cat_$j%03d", cats, 3 + rnd.nextInt(3))
    }

    persons.foreach { p =>
      val e = p.entity
      labels += (e -> e)
      def maybe(pr: Double)(t: => Triple): Unit = if (rnd.nextDouble() < pr) triples += t
      maybe(0.92)(Triple.num(e, "Net_Worth", p.netWorth))
      maybe(0.95)(Triple.str(e, "Gender", if (p.male) "M" else "F"))
      maybe(0.85)(Triple.num(e, "Age", 20 + rnd.nextInt(55)))
      maybe(0.80)(Triple.num(e, "Years_Active", 3 + rnd.nextInt(35)))
      maybe(0.80)(Triple.str(e, "Citizenship", s"Country_${rnd.nextInt(15)}"))
      if (p.category == "Actors" || p.category == "Directors_Producers" || p.category == "Musicians") {
        maybe(0.85)(Triple.num(e, "Awards", p.awards))
        maybe(0.75)(Triple.num(e, "Honors", p.awards + math.max(0, rnd.nextGaussian() * 1.0).round.toInt))
      }
      if (p.category == "Athletes") {
        maybe(0.90)(Triple.num(e, "Cups_Total", p.cups))
        maybe(0.80)(Triple.num(e, "National_Cups", (p.cups * (0.3 + rnd.nextDouble() * 0.5)).round.toDouble))
        maybe(0.82)(Triple.num(e, "Draft_Pick", p.draftPick))
      }
      triples += Triple.str(e, "Person_Type", "Celebrity")
      triples += Triple.str(e, "Person_WikiID", s"QP${20000 + persons.indexOf(p)}")
      noiseNumCfg.foreach { case (name, cats, fameBiased) =>
        val pr =
          if (!cats.contains(p.category)) 0.02
          else if (fameBiased) (if (p.fame > 0.5) 0.8 else 0.3)
          else 0.5
        maybe(pr)(Triple.num(e, name, rnd.nextDouble() * 10))
      }
      noiseCatCfg.foreach { case (name, cats, levels) =>
        val pr = if (cats.contains(p.category)) 0.5 else 0.02
        maybe(pr)(Triple.str(e, name, s"v${rnd.nextInt(levels)}"))
      }
    }

    // "Ronaldo" is registered as the label of two different entities → the
    // linker refuses to disambiguate and the athlete's attributes go missing.
    labels += ("Athletes_Person_01" -> "Ronaldo")
    labels += ("Athletes_Person_02" -> "Ronaldo")

    KgBuilder.build(spark, triples.result(), labels.result())
  }

  def bundle(spark: SparkSession): DatasetBundle =
    DatasetBundle(
      name = "Forbes",
      facts = facts(spark),
      kg = kg(spark),
      links = Seq(LinkSpec("Name", "", "kg:Person")),
      designRows = DesignRows
    )
}
