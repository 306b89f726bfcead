package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._

/** Ranking metrics for the independent-decision evaluation (Table VI). */
final case class RankingMetrics(hitsAt1: Double, hitsAt10: Double, mrr: Double)

/** Evaluation metrics (paper §VII-A).
  *
  * The paper's main metric is *accuracy*: correctly aligned source
  * entities over all test source entities. For methods that output ranked
  * lists (everything except collective CEAFF) Hits@k and MRR are also
  * reported.
  */
object Evaluation {

  /** Accuracy of a matching `(src, dst)` against gold test pairs
    * `(src, dst)`. Unmatched sources count as wrong.
    */
  def accuracy(matches: DataFrame, gold: DataFrame): Double = {
    val total = gold.count()
    require(total > 0, "empty gold set")
    val correct = gold
      .join(matches.select(col("src"), col("dst").as("got")), Seq("src"))
      .filter(col("dst") === col("got"))
      .count()
    correct.toDouble / total
  }

  /** Hits@1, Hits@10 and MRR of a similarity matrix w.r.t. gold pairs.
    * The rank of a gold target is its 1-based position in the source's
    * row ordered by descending score (ties by ascending target id). A
    * gold pair absent from the matrix counts as an infinite rank.
    */
  def rankingMetrics(m: DataFrame, gold: DataFrame): RankingMetrics = {
    val w = Window.partitionBy("src").orderBy(desc("score"), asc("dst"))
    val ranked = m.withColumn("rank", row_number().over(w))
    val total = gold.count()
    require(total > 0, "empty gold set")
    val agg = gold.join(ranked, Seq("src", "dst"), "left")
      .agg(
        sum(when(col("rank") <= 1, 1).otherwise(0)).as("h1"),
        sum(when(col("rank") <= 10, 1).otherwise(0)).as("h10"),
        sum(coalesce(lit(1.0) / col("rank"), lit(0.0))).as("rr"))
      .first()
    RankingMetrics(
      hitsAt1 = agg.getLong(0).toDouble / total,
      hitsAt10 = agg.getLong(1).toDouble / total,
      mrr = agg.getDouble(2) / total)
  }
}
