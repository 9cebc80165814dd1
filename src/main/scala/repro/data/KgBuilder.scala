package repro.data

import org.apache.spark.sql.{Row, SparkSession}
import org.apache.spark.sql.types._

import repro.kg.KnowledgeGraph

/** One KG triple under construction (driver side — entity worlds are tiny;
  * the fact tables are what scales).
  */
final case class Triple(
    subject: String,
    predicate: String,
    value: Option[String],
    valueNum: Option[Double],
    ref: Option[String]
)

object Triple {
  def num(s: String, p: String, v: Double): Triple  = Triple(s, p, Some(v.toString), Some(v), None)
  def str(s: String, p: String, v: String): Triple  = Triple(s, p, Some(v), None, None)
  def ref(s: String, p: String, r: String): Triple  = Triple(s, p, None, None, Some(r))
}

/** Materializes locally-generated triples/labels as a [[KnowledgeGraph]]. */
object KgBuilder {

  private val tripleSchema = StructType(Seq(
    StructField("subject", StringType),
    StructField("predicate", StringType),
    StructField("value", StringType),
    StructField("valueNum", DoubleType),
    StructField("ref", StringType)
  ))

  private val labelSchema = StructType(Seq(
    StructField("entity", StringType),
    StructField("label", StringType)
  ))

  def build(spark: SparkSession, triples: Seq[Triple], labels: Seq[(String, String)]): KnowledgeGraph = {
    val tRows = triples.map(t =>
      Row(t.subject, t.predicate, t.value.orNull, t.valueNum.map(Double.box).orNull, t.ref.orNull)
    )
    val lRows = labels.map { case (e, l) => Row(e, l) }
    KnowledgeGraph(
      spark.createDataFrame(spark.sparkContext.parallelize(tRows, 4), tripleSchema),
      spark.createDataFrame(spark.sparkContext.parallelize(lRows, 1), labelSchema)
    )
  }

  /** 1-based descending rank (1 = largest) — for the *_Rank alias attributes. */
  def ranks(values: Seq[Double]): Seq[Int] = {
    val order = values.zipWithIndex.sortBy(-_._1).map(_._2)
    val out   = new Array[Int](values.size)
    order.zipWithIndex.foreach { case (origIdx, rank) => out(origIdx) = rank + 1 }
    out.toSeq
  }
}
