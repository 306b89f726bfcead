package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions.col
import repro.kg.EaBenchmark
import repro.text.Levenshtein

/** String feature `M^l`: Levenshtein ratio between entity names (paper
  * §IV-C), with substitution cost 2 (`lev*`), computed as a DataFrame
  * cross-join over the test domain.
  */
object StringFeature {

  /** Full `M^l` for a benchmark. */
  def matrix(spark: SparkSession, b: EaBenchmark): DataFrame = {
    val n1 = b.names1.select(col("id").as("src"), col("name").as("name1"))
    val n2 = b.names2.select(col("id").as("dst"), col("name").as("name2"))
    SimilarityMatrix.testDomain(b.test)
      .join(n1, Seq("src"))
      .join(n2, Seq("dst"))
      .select(col("src"), col("dst"),
        Levenshtein.ratioUdf(col("name1"), col("name2")).as("score"))
  }
}
