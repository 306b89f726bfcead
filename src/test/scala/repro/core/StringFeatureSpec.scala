package repro.core

import org.apache.spark.sql.functions._
import repro.kg.{BenchmarkGen, Scenario}
import repro.text.Levenshtein
import repro.{Fixtures, Oracle, SparkSpec}

class StringFeatureSpec extends SparkSpec with Fixtures {
  import spark.implicits._

  private lazy val mono = BenchmarkGen
    .generate(spark, Scenario.SrprsWd, nGold = 150, nFringe = 50, seed = 7).cached()
  private lazy val zh = BenchmarkGen
    .generate(spark, Scenario.Dbp15kZhEn, nGold = 150, nFringe = 50, seed = 7).cached()

  test("string matrix spans the test domain with scores in [0,1]") {
    val m = StringFeature.matrix(spark, mono).cache()
    val n = mono.test.count()
    assert(m.count() == n * n)
    assert(m.filter(col("score") < 0 || col("score") > 1).count() == 0)
    m.unpersist()
  }

  test("matrix cells equal the driver-side Levenshtein ratio") {
    val m = StringFeature.matrix(spark, mono)
    val sample = m.limit(200)
      .join(mono.names1.select(col("id").as("src"), col("name").as("n1")), Seq("src"))
      .join(mono.names2.select(col("id").as("dst"), col("name").as("n2")), Seq("dst"))
      .select("n1", "n2", "score").as[(String, String, Double)].collect()
    sample.foreach { case (a, bb, s) =>
      assert(math.abs(s - Levenshtein.ratio(a, bb)) < 1e-12, s"'$a' vs '$bb'")
    }
  }

  test("oracle: unit-cost Levenshtein UDF matches DuckDB's levenshtein()") {
    val pairs = Seq(
      ("kitten", "sitting"), ("flaw", "lawn"), ("abc", "abc"),
      ("", "abc"), ("banana", "bandana"), ("paris", "prais"))
      .toDF("a", "b")
    val sparkSide = pairs.select(col("a"), col("b"),
      Levenshtein.levUdf(col("a"), col("b")).cast("int").as("d"))
    Oracle.assertEquivalent(sparkSide,
      "SELECT a, b, CAST(levenshtein(a, b) AS INT) AS d FROM p",
      "p" -> pairs)
  }

  test("mono-lingual gold pairs have near-perfect string similarity") {
    val m = StringFeature.matrix(spark, mono)
    val diag = m.filter(col("src") === col("dst")).agg(avg("score")).first().getDouble(0)
    assert(diag > 0.9, s"mono diag mean $diag")
  }

  test("string feature alone nearly solves mono-lingual alignment") {
    val acc = Evaluation.accuracy(
      SimilarityMatrix.greedyMatch(StringFeature.matrix(spark, mono)), mono.test)
    assert(acc > 0.8, s"mono string-only accuracy $acc")
  }

  test("string feature is useless on distant language pairs") {
    val m = StringFeature.matrix(spark, zh)
    val diag = m.filter(col("src") === col("dst")).agg(avg("score")).first().getDouble(0)
    assert(diag < 0.1, s"ZH-EN diag mean $diag — script separation broken")
  }
}
