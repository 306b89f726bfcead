package repro.kg

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** Per-KG statistics in the shape of the paper's Table II. */
final case class KgPairStats(
    dataset: String,
    kg1Label: String, triples1: Long, entities1: Long,
    kg2Label: String, triples2: Long, entities2: Long,
    goldPairs: Long, seedPairs: Long, testPairs: Long)

object KgStats {

  /** Distinct entities mentioned by a KG (named or appearing in triples). */
  def entityCount(triples: DataFrame, names: DataFrame): Long =
    names.select(col("id"))
      .union(triples.select(col("src").as("id")))
      .union(triples.select(col("dst").as("id")))
      .distinct()
      .count()

  def of(b: EaBenchmark): KgPairStats = {
    val s = b.scenario
    KgPairStats(
      dataset = s.name,
      kg1Label = s.lang1.code, triples1 = b.triples1.count(),
      entities1 = entityCount(b.triples1, b.names1),
      kg2Label = s.lang2.code, triples2 = b.triples2.count(),
      entities2 = entityCount(b.triples2, b.names2),
      goldPairs = b.seeds.count() + b.test.count(),
      seedPairs = b.seeds.count(),
      testPairs = b.test.count())
  }
}
