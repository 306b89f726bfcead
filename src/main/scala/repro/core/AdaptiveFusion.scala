package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** Result of one fusion step: per-feature adaptive weights (summing to 1)
  * and the fused similarity matrix `Σ w_k · M^k`.
  */
final case class FusionResult(weights: Map[String, Double], fused: DataFrame)

/** Adaptive feature fusion (paper §V).
  *
  * Outcome-level fusion over similarity matrices. Feature weights are
  * derived from *confident correspondences* — cells maximal in both
  * their row and column — after two filters:
  *  1. conflict filter: if different features propose different targets
  *     for the same source entity, all of that source's candidates drop;
  *  2. shared-by-all filter: a correspondence found by *every* feature
  *     characterises none of them and drops.
  * Each surviving correspondence weighs `1/n` (n = #features that found
  * it), except cells with score `> θ1` which weigh only `θ2` — this caps
  * runaway weight for a feature that is nearly perfect, so weaker
  * features keep contributing. A feature's weight is its share of the
  * total correspondence weight.
  */
object AdaptiveFusion {

  val DefaultTheta1 = 0.98
  val DefaultTheta2 = 0.1

  /** Compute adaptive weights for `features` (name → matrix).
    *
    * Falls back to equal weights when no correspondence survives the
    * filters (e.g. degenerate tiny inputs), so fusion is always defined.
    */
  def adaptiveWeights(spark: SparkSession, features: Seq[(String, DataFrame)],
                      theta1: Double = DefaultTheta1,
                      theta2: Double = DefaultTheta2,
                      thetaCap: Boolean = true): Map[String, Double] = {
    require(features.nonEmpty, "no features to fuse")
    val k = features.size
    if (k == 1) return Map(features.head._1 -> 1.0)

    // Zero-score cells are never evidence: on sparse KGs an all-zero row
    // and column tie pairwise and would flood the candidate set.
    val candidates = features.map { case (name, m) =>
      SimilarityMatrix.confidentCells(m)
        .filter(col("score") > 0)
        .withColumn("feature", lit(name))
    }.reduce(_ union _).cache()

    // Conflict filter: a source entity for which the features (or a tie
    // within one feature) propose more than one distinct target loses all
    // its candidates.
    val unconflicted = {
      val perSrc = candidates.groupBy("src")
        .agg(countDistinct("dst").as("ndst"))
        .filter(col("ndst") === 1)
        .select(col("src"))
      candidates.join(perSrc, Seq("src"))
    }

    // Shared-by-all filter + per-correspondence feature count n.
    val withN = {
      val perPair = unconflicted.groupBy("src", "dst")
        .agg(countDistinct("feature").as("n"))
        .filter(col("n") < k)
      unconflicted.join(perPair, Seq("src", "dst"))
    }

    val capped =
      if (thetaCap)
        withN.withColumn("w",
          when(col("score") > theta1, lit(theta2)).otherwise(lit(1.0) / col("n")))
      else
        withN.withColumn("w", lit(1.0) / col("n"))

    val sums = capped.groupBy("feature").agg(sum("w").as("ws"))
      .collect().map(r => r.getString(0) -> r.getDouble(1)).toMap
    candidates.unpersist()

    val total = sums.values.sum
    if (total <= 0.0) features.map { case (n, _) => n -> 1.0 / k }.toMap
    else features.map { case (n, _) => n -> sums.getOrElse(n, 0.0) / total }.toMap
  }

  /** Adaptive fusion of `features` into one matrix. */
  def fuse(spark: SparkSession, features: Seq[(String, DataFrame)],
           theta1: Double = DefaultTheta1, theta2: Double = DefaultTheta2,
           thetaCap: Boolean = true): FusionResult = {
    val w = adaptiveWeights(spark, features, theta1, theta2, thetaCap)
    FusionResult(w, SimilarityMatrix.weightedSum(spark,
      features.map { case (name, m) => (m, w(name)) }))
  }

  /** Fixed equal-weight fusion — the paper's "w/o AFF" ablation. */
  def fuseEqual(spark: SparkSession, features: Seq[(String, DataFrame)]): FusionResult = {
    require(features.nonEmpty, "no features to fuse")
    val w = 1.0 / features.size
    FusionResult(features.map { case (n, _) => n -> w }.toMap,
      SimilarityMatrix.weightedSum(spark, features.map { case (_, m) => (m, w) }))
  }

  /** Fixed arbitrary-weight fusion (used by the LR baseline). Weights are
    * normalised to sum to 1.
    */
  def fuseFixed(spark: SparkSession, features: Seq[(String, DataFrame)],
                weights: Map[String, Double]): FusionResult = {
    val total = features.map { case (n, _) => weights(n) }.sum
    require(total > 0, s"non-positive total weight: $weights")
    val norm = weights.map { case (n, w) => n -> w / total }
    FusionResult(norm, SimilarityMatrix.weightedSum(spark,
      features.map { case (n, m) => (m, norm(n)) }))
  }
}
