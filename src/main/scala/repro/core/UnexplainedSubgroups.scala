package repro.core

import org.apache.spark.sql.functions._

import repro.info.{InfoTheory, LocalInfo}

/** A data group (context refinement C' of C) for which the explanation E is
  * not satisfactory: I(O;T|C',E) > τ.
  */
final case class Subgroup(conds: Seq[(String, String)], size: Double, score: Double) {
  def pretty: String = conds.map { case (a, v) => s"$a = $v" }.mkString(" AND ")
}

/** Top-k unexplained data groups (Alg. 2, §4.3).
  *
  * The refinement lattice is traversed top-down with a max-heap on group
  * size; a popped refinement whose explanation score exceeds τ is accepted
  * (unless an ancestor was already accepted), otherwise its children are
  * pushed. Spark reduces the data once to weighted contingency cells over
  * (T, O, E, refinement attributes); every node of the traversal then scores
  * against those cells locally, so the whole search costs a single Spark job
  * regardless of how many refinements are inspected.
  */
object UnexplainedSubgroups {

  private val NullTag = "__null"
  private val NaTag   = "__na"

  private final case class Node(conds: List[(Int, String)], cells: LocalInfo.Cells, size: Double)

  def topK(
      engine: TaskEngine,
      explanation: Seq[Candidate],
      refine: Seq[Candidate],
      tau: Double,
      k: Int,
      maxNodes: Int = 100000
  ): Seq[Subgroup] = {
    require(refine.nonEmpty, "no refinement attributes")
    val explNames = explanation.map(_.name)
    val refNames  = refine.map(_.name)
    val allAttrs  = (explanation ++ refine).distinct

    // One Spark reduction: weighted cells over (T, O, E..., refinements...).
    // Missing refinement values become their own category so group sizes
    // reflect the full data; missing explanation values are kept but excluded
    // from the score (complete-case, as everywhere else).
    val frame0 = engine.joinedWith(allAttrs)
    val frame = refNames.foldLeft(frame0)((d, c) => d.withColumn(c, coalesce(col(c), lit(NaTag))))
    val cols  = Seq(TaskEngine.TCol, TaskEngine.OCol) ++ explNames ++ refNames
    val cellRows = frame
      .na.drop("any", Seq(TaskEngine.TCol, TaskEngine.OCol))
      .groupBy(cols.map(col): _*)
      .agg(sum(col("__wt")).as("w"))
      .collect()
    val cells: LocalInfo.Cells = cellRows.toIndexedSeq.map { r =>
      val vals = IndexedSeq.tabulate(cols.size)(i => if (r.isNullAt(i)) NullTag else r.get(i).toString)
      (vals, r.getDouble(cols.size))
    }

    val tIdx    = Seq(0)
    val oIdx    = Seq(1)
    val explIdx = explNames.indices.map(_ + 2)
    val refIdx  = refNames.indices.map(_ + 2 + explNames.size)

    def score(cs: LocalInfo.Cells): Double = {
      val complete = cs.filter(c => explIdx.forall(i => c._1(i) != NullTag))
      LocalInfo.cmi(complete, tIdx, oIdx, explIdx, mm = true)
    }

    // Children extend a node with an assignment on a refinement attribute of
    // strictly larger index, so every lattice node is generated exactly once.
    def children(n: Node): Seq[Node] = {
      val lastPos = n.conds.headOption.map(c => refIdx.indexOf(c._1)).getOrElse(-1)
      for {
        pos <- (lastPos + 1) until refIdx.size
        i = refIdx(pos)
        v <- n.cells.iterator.map(_._1(i)).filter(v => v != NaTag && v != NullTag).toSeq.distinct.sorted
        sub = LocalInfo.filter(n.cells, i, v)
        sz  = LocalInfo.size(sub)
        if sz > 0
      } yield Node((i, v) :: n.conds, sub, sz)
    }

    val heap = scala.collection.mutable.PriorityQueue.empty[Node](Ordering.by(_.size))
    val root = Node(Nil, cells, LocalInfo.size(cells))
    children(root).foreach(heap.enqueue(_))

    val accepted = scala.collection.mutable.ArrayBuffer.empty[Node]
    var visited  = 0
    while (accepted.size < k && heap.nonEmpty && visited < maxNodes) {
      val n = heap.dequeue()
      visited += 1
      if (score(n.cells) > tau) {
        // update(): suppress descendants of already-accepted groups.
        val condSet = n.conds.toSet
        if (!accepted.exists(a => a.conds.toSet.subsetOf(condSet))) accepted += n
      } else {
        children(n).foreach(heap.enqueue(_))
      }
    }

    accepted.toSeq.map { n =>
      Subgroup(
        n.conds.reverse.map { case (i, v) => refNames(refIdx.indexOf(i)) -> v },
        LocalInfo.size(n.cells),
        score(n.cells)
      )
    }
  }

  /** Naive reference implementation (full lattice enumeration up to
    * `maxDepth`) used by the tests to validate Alg. 2.
    */
  def naive(
      engine: TaskEngine,
      explanation: Seq[Candidate],
      refine: Seq[Candidate],
      tau: Double,
      k: Int,
      maxDepth: Int = 2
  ): Seq[Subgroup] = {
    val all = topKAll(engine, explanation, refine, tau, maxDepth)
    // Largest-first, then drop groups dominated by an accepted ancestor.
    val out = scala.collection.mutable.ArrayBuffer.empty[Subgroup]
    for (g <- all.sortBy(-_.size) if out.size < k) {
      val cs = g.conds.toSet
      if (!out.exists(a => a.conds.toSet.subsetOf(cs))) out += g
    }
    out.toSeq
  }

  private def topKAll(
      engine: TaskEngine,
      explanation: Seq[Candidate],
      refine: Seq[Candidate],
      tau: Double,
      maxDepth: Int
  ): Seq[Subgroup] = {
    val explNames = explanation.map(_.name)
    val refNames  = refine.map(_.name)
    val allAttrs  = (explanation ++ refine).distinct
    val frame0    = engine.joinedWith(allAttrs)
    val frame = refNames.foldLeft(frame0)((d, c) => d.withColumn(c, coalesce(col(c), lit(NaTag))))
    val cols  = Seq(TaskEngine.TCol, TaskEngine.OCol) ++ explNames ++ refNames
    val cells: LocalInfo.Cells = frame
      .na.drop("any", Seq(TaskEngine.TCol, TaskEngine.OCol))
      .groupBy(cols.map(col): _*)
      .agg(sum(col("__wt")).as("w"))
      .collect()
      .toIndexedSeq
      .map { r =>
        val vals = IndexedSeq.tabulate(cols.size)(i => if (r.isNullAt(i)) NullTag else r.get(i).toString)
        (vals, r.getDouble(cols.size))
      }
    val explIdx = explNames.indices.map(_ + 2)
    val refIdx  = refNames.indices.map(_ + 2 + explNames.size)

    def score(cs: LocalInfo.Cells): Double =
      LocalInfo.cmi(cs.filter(c => explIdx.forall(i => c._1(i) != NullTag)), Seq(0), Seq(1), explIdx, mm = true)

    def rec(startPos: Int, conds: List[(Int, String)], cs: LocalInfo.Cells): Seq[Subgroup] = {
      val here =
        if (conds.nonEmpty && score(cs) > tau)
          Seq(Subgroup(conds.reverse.map { case (i, v) => refNames(refIdx.indexOf(i)) -> v }, LocalInfo.size(cs), score(cs)))
        else Nil
      val deeper =
        if (conds.size >= maxDepth) Nil
        else
          for {
            pos <- startPos until refIdx.size
            i = refIdx(pos)
            v <- cs.iterator.map(_._1(i)).filter(v => v != NaTag && v != NullTag).toSeq.distinct
            sub = LocalInfo.filter(cs, i, v)
            if LocalInfo.size(sub) > 0
            g <- rec(pos + 1, (i, v) :: conds, sub)
          } yield g
      here ++ deeper
    }
    rec(0, Nil, cells)
  }
}
