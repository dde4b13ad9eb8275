package repro.core

import repro.graph.{LocalGraph, SparkGraph}
import repro.setalg.SetFactory

/** k-clique-star listing (paper §6.6).
  *
  * A k-clique-star is a k-clique C plus the non-empty set S of "star"
  * vertices adjacent to *every* vertex of C. The paper's observation: each
  * star vertex forms a (k+1)-clique with C, so k-clique-stars are found from
  * clique listing plus set algebra — here directly: for each k-clique C,
  * S = (∩_{v∈C} N(v)) \ C, emitted when S ≠ ∅.
  */
object KCliqueStar {

  final case class Result(stars: Long, starVertices: Long)

  /** Count k-clique-stars and total star-vertex memberships.
    * Distributed exactly like node-parallel k-clique listing.
    */
  def count(g: SparkGraph, k: Int, rank: Array[Int],
            factory: SetFactory = SetFactory.sorted, tasks: Int = 0): Result = {
    require(k >= 2, "k-clique-star needs k ≥ 2")
    val spark = g.spark
    import spark.implicits._
    val local = g.toLocal
    val oriented = local.orient(rank)
    val bcL = spark.sparkContext.broadcast(local)
    val bcO = spark.sparkContext.broadcast(oriented)
    val nTasks = if (tasks > 0) tasks else spark.sparkContext.defaultParallelism * 4
    val agg = spark.range(local.n).as[Long]
      .repartition(nTasks)
      .map { u => countFromVertex(bcL.value, bcO.value, factory, k, u.toInt) }
      .collect()
    bcL.destroy(); bcO.destroy()
    Result(agg.map(_._1).sum, agg.map(_._2).sum)
  }

  /** Driver-side reference: list (clique, starSet) pairs. */
  def listLocal(local: LocalGraph, k: Int, rank: Array[Int],
                factory: SetFactory = SetFactory.sorted): Seq[(Seq[Int], Seq[Int])] = {
    KClique.listLocal(local, k, rank, factory).flatMap { c =>
      val s = starSet(local, factory, c)
      if (s.nonEmpty) Some((c, s)) else None
    }
  }

  /** S = (∩_{v∈C} N(v)) \ C — pure set algebra over the chosen representation. */
  private def starSet(local: LocalGraph, factory: SetFactory, clique: Seq[Int]): Seq[Int] = {
    val s = factory.fromSorted(local.neighbors(clique.head), local.n)
    clique.tail.foreach(v =>
      s.intersectInplace(factory.fromSorted(local.neighbors(v), local.n)))
    clique.foreach(s.remove)
    s.toArray.toSeq
  }

  private def countFromVertex(local: LocalGraph, oriented: LocalGraph,
                              factory: SetFactory, k: Int, u: Int): (Long, Long) = {
    var stars = 0L
    var starVerts = 0L
    def rec(i: Int, ci: repro.setalg.VertexSet, prefix: List[Int]): Unit = {
      if (i == k) {
        ci.iterator.foreach { v =>
          val s = starSet(local, factory, v :: prefix)
          if (s.nonEmpty) { stars += 1; starVerts += s.length }
        }
        return
      }
      val it = ci.iterator
      while (it.hasNext) {
        val v = it.next()
        val nPlus = factory.fromSorted(oriented.neighbors(v), oriented.n)
        rec(i + 1, nPlus.intersect(ci), v :: prefix)
      }
    }
    rec(2, factory.fromSorted(oriented.neighbors(u), oriented.n), List(u))
    (stars, starVerts)
  }
}
