package repro.study

import repro.core.Explanation

/** A family of semantically-equivalent attributes (e.g. HDI / HDI_Rank /
  * GDP / GDP_Per_Capita all describe "the economy"): hitting any member
  * counts as explaining that factor; hitting several is redundancy.
  */
final case class AliasGroup(label: String, members: Set[String], weight: Double = 1.0) {
  def hits(attrs: Seq[String]): Int = attrs.count(members.contains)
}

/** The planted causal ground truth of one study query: the factors that
  * *generate* the outcome (required) and factors that are causally present
  * but secondary (optional — choosing them is correct but not necessary).
  */
final case class GroundTruth(required: Seq[AliasGroup], optional: Seq[AliasGroup] = Nil) {

  private def all: Seq[AliasGroup] = required ++ optional

  /** Weighted fraction of required factors covered. */
  def recall(attrs: Seq[String]): Double = {
    val tot = required.map(_.weight).sum
    if (tot <= 0) 1.0
    else required.filter(_.hits(attrs) > 0).map(_.weight).sum / tot
  }

  /** Fraction of chosen attributes that belong to any true factor. */
  def precision(attrs: Seq[String]): Double =
    if (attrs.isEmpty) 0.0
    else attrs.count(a => all.exists(_.members.contains(a))).toDouble / attrs.size

  /** Number of extra attributes hitting an already-covered factor. */
  def redundancy(attrs: Seq[String]): Int =
    all.map(g => math.max(0, g.hits(attrs) - 1)).sum
}

/** The user-study substitute (§5.1, Tables 2–3): 150 seeded "subjects" each
  * rate an explanation 1–5. A subject's rating is a noisy draw around an
  * objective quality score computed from the planted ground truth — coverage
  * of the true confounders, precision, how much of the correlation was
  * explained away, and a penalty for redundant picks (the paper's subjects
  * punished Top-K for exactly that).
  */
object SimulatedSubjects {

  val NumSubjects = 150

  def quality(expl: Explanation, truth: GroundTruth): Double = {
    val names = expl.names
    val q = 0.50 * truth.recall(names) +
      0.25 * truth.precision(names) +
      0.25 * expl.improvement -
      0.15 * truth.redundancy(names)
    math.min(1.0, math.max(0.0, q))
  }

  /** Integer 1–5 ratings from `NumSubjects` seeded subjects. */
  def ratings(q: Double, seed: Long): Seq[Int] = {
    val rnd = new scala.util.Random(seed)
    (1 to NumSubjects).map { _ =>
      val r = 1.0 + 4.0 * (q + rnd.nextGaussian() * 0.15)
      math.max(1, math.min(5, math.round(r).toInt))
    }
  }

  /** (average score, variance) of the simulated panel for one explanation. */
  def score(expl: Explanation, truth: GroundTruth, seed: Long): (Double, Double) = {
    val rs   = ratings(quality(expl, truth), seed)
    val mean = rs.sum.toDouble / rs.size
    val vr   = rs.map(r => (r - mean) * (r - mean)).sum / rs.size
    (mean, vr)
  }
}
