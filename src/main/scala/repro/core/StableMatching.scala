package repro.core

import org.apache.spark.rdd.RDD
import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.storage.StorageLevel
import scala.collection.mutable

/** Collective EA as the Stable Matching Problem (paper §VI).
  *
  * Preference lists on both sides come from the fused similarity matrix:
  * a source entity prefers targets by descending score; a target prefers
  * proposers by descending score of the same cell. Ties are broken by
  * ascending id on both sides, making preferences strict and the
  * (source-optimal) stable matching unique — so the distributed and the
  * reference implementation must agree exactly, which the tests check.
  *
  * [[daa]] is the deferred acceptance algorithm as an iterative RDD
  * computation: every round, all currently-unmatched source entities
  * propose to the next target on their list simultaneously; each target
  * keeps the best proposal seen so far (possibly displacing its
  * provisional partner). This parallel variant produces the same
  * source-optimal stable matching as the sequential Gale–Shapley.
  */
object StableMatching {

  /** Deferred acceptance on a similarity matrix, distributed.
    *
    * In CEAFF both sides rank by the *same* matrix cell values (a source
    * prefers targets by `M(u,v)`, a target prefers sources by the same
    * `M(u,v)`), with ties broken by ascending opposite-side id. Under
    * such aligned strict preferences the stable matching is unique and
    * can be computed by repeatedly matching every cell that is
    * simultaneously the maximum of its row and of its column (the
    * globally-top remaining cell always is one, so progress is
    * guaranteed; any such mutual-best pair blocks every matching that
    * omits it, so it belongs to every stable matching). This "parallel
    * proposal wave" formulation matches whole batches per round —
    * typically O(log n) rounds instead of the O(n²) single-proposal
    * rounds of textbook Gale–Shapley — and returns exactly the matching
    * of [[referenceDaa]], which the test suite verifies.
    *
    * @param m similarity matrix `(src, dst, score)`; preference lists are
    *          complete over the matrix's support
    * @return matches `(src, dst)`; every source entity is matched when
    *         `#src <= #dst` and lists are complete
    */
  def daa(spark: SparkSession, m: DataFrame, maxRounds: Int = 100000): DataFrame = {
    import spark.implicits._
    val sc = spark.sparkContext

    // Strict "better" under aligned preferences: higher score, then the
    // smaller opposite-side id (same tie-break on both sides).
    def better(a: (Long, Double), b: (Long, Double)): (Long, Double) =
      if (a._2 > b._2 || (a._2 == b._2 && a._1 < b._1)) a else b

    val cells: RDD[(Long, Long, Double)] =
      m.select("src", "dst", "score").as[(Long, Long, Double)].rdd
        .persist(StorageLevel.MEMORY_AND_DISK)
    val counts = cells.mapPartitions { it =>
      val ss = scala.collection.mutable.Set.empty[Long]
      val ds = scala.collection.mutable.Set.empty[Long]
      it.foreach { case (s, d, _) => ss += s; ds += d }
      Iterator((ss.toSet, ds.toSet))
    }.reduce { case ((a1, a2), (b1, b2)) => (a1 ++ b1, a2 ++ b2) }
    val target = math.min(counts._1.size, counts._2.size)

    val matchedSrc = scala.collection.mutable.Set.empty[Long]
    val matchedDst = scala.collection.mutable.Set.empty[Long]
    val matched = scala.collection.mutable.ArrayBuffer.empty[(Long, Long)]
    var round = 0

    // One Spark job per round: a single composite-key reduce finds every
    // row-best and col-best among unmatched cells; the (tiny) result is
    // collected and the mutual-best pairs extracted on the driver.
    while (matched.size < target && round < maxRounds) {
      val bs = sc.broadcast(matchedSrc.toSet)
      val bd = sc.broadcast(matchedDst.toSet)
      val bests: Array[((Boolean, Long), (Long, Double))] = cells
        .filter { case (s, d, _) => !bs.value(s) && !bd.value(d) }
        .flatMap { case (s, d, v) =>
          Iterator(((false, s), (d, v)), ((true, d), (s, v)))
        }
        .reduceByKey(better)
        .collect()
      val rowBest = bests.collect { case ((false, s), (d, _)) => s -> d }.toMap
      val colBest = bests.collect { case ((true, d), (s, _)) => d -> s }.toMap
      val mutual = rowBest.filter { case (s, d) => colBest.get(d).contains(s) }
      require(mutual.nonEmpty,
        s"no mutual-best cell with ${target - matched.size} pairs to go — impossible")
      mutual.foreach { case (s, d) => matchedSrc += s; matchedDst += d }
      matched ++= mutual
      bs.destroy(); bd.destroy()
      round += 1
    }
    cells.unpersist()
    require(matched.size == target, s"stable matching did not converge within $maxRounds rounds")
    matched.toSeq.toDF("src", "dst")
  }

  /** Sequential Gale–Shapley on the driver with identical tie-breaking —
    * the correctness oracle for [[daa]] and a fast path for tests.
    */
  def referenceDaa(cells: Seq[(Long, Long, Double)]): Map[Long, Long] = {
    val prefs: Map[Long, Array[(Long, Double)]] =
      cells.groupBy(_._1).map { case (s, rows) =>
        s -> rows.map { case (_, d, sc) => (d, sc) }.sortBy { case (d, sc) => (-sc, d) }.toArray
      }
    val score: Map[(Long, Long), Double] =
      cells.map { case (s, d, sc) => (s, d) -> sc }.toMap

    val next = mutable.Map.empty[Long, Int].withDefaultValue(0)
    val engagedTo = mutable.Map.empty[Long, Long] // dst -> src
    val free = mutable.Queue.empty[Long]
    free ++= prefs.keys.toSeq.sorted

    while (free.nonEmpty) {
      val u = free.dequeue()
      val list = prefs(u)
      if (next(u) < list.length) {
        val (v, sc) = list(next(u))
        next(u) += 1
        engagedTo.get(v) match {
          case None => engagedTo(v) = u
          case Some(cur) =>
            val curSc = score((cur, v))
            val newWins = sc > curSc || (sc == curSc && u < cur)
            if (newWins) { engagedTo(v) = u; free.enqueue(cur) }
            else free.enqueue(u)
        }
      } // else: exhausted list, stays unmatched
    }
    engagedTo.map { case (v, u) => u -> v }.toMap
  }

  /** Blocking pairs of a matching under the matrix's preferences — empty
    * iff the matching is stable. Exposed for property tests.
    */
  def blockingPairs(cells: Seq[(Long, Long, Double)],
                    matching: Map[Long, Long]): Seq[(Long, Long)] = {
    val score = cells.map { case (s, d, sc) => (s, d) -> sc }.toMap
    val partnerOfDst = matching.map(_.swap)
    def srcPrefers(u: Long, v: Long): Boolean = matching.get(u) match {
      case None => true // unmatched source prefers anyone it can score
      case Some(cur) =>
        val a = score((u, v)); val b = score((u, cur))
        a > b || (a == b && v < cur)
    }
    def dstPrefers(v: Long, u: Long): Boolean = partnerOfDst.get(v) match {
      case None => true
      case Some(cur) =>
        val a = score((u, v)); val b = score((cur, v))
        a > b || (a == b && u < cur)
    }
    cells.collect {
      case (u, v, _) if matching.get(u) != Some(v) && srcPrefers(u, v) && dstPrefers(v, u) =>
        (u, v)
    }
  }
}
