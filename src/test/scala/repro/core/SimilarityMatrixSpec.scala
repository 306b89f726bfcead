package repro.core

import org.apache.spark.sql.functions._
import repro.{Fixtures, Oracle, SparkSpec}

class SimilarityMatrixSpec extends SparkSpec with Fixtures {
  import spark.implicits._

  private val m = denseMat(Seq(
    Seq(0.9, 0.3, 0.2),
    Seq(0.85, 0.8, 0.3),
    Seq(0.2, 0.7, 0.65)))

  test("greedyMatch picks the row argmax") {
    assert(matchMap(SimilarityMatrix.greedyMatch(m)) == Map(0L -> 0L, 1L -> 0L, 2L -> 1L))
  }

  test("greedyMatch breaks score ties towards the smaller target id") {
    val tied = mat(Seq((0L, 5L, 0.7), (0L, 2L, 0.7), (0L, 9L, 0.1)))
    assert(matchMap(SimilarityMatrix.greedyMatch(tied)) == Map(0L -> 2L))
  }

  test("oracle: greedyMatch agrees with DuckDB window query") {
    Oracle.assertEquivalent(
      SimilarityMatrix.greedyMatch(m),
      """SELECT src, dst FROM (
        |  SELECT src, dst, row_number() OVER (
        |    PARTITION BY src
        |    ORDER BY CAST(score AS DOUBLE) DESC, CAST(dst AS BIGINT) ASC) AS rn
        |  FROM m) WHERE rn = 1""".stripMargin,
      "m" -> m)
  }

  test("confidentCells keeps only row-and-column maxima") {
    val got = cells(SimilarityMatrix.confidentCells(m)).toSet
    // (0,0)=0.9 is max of row 0 and col 0. (1,1)=0.8 is col-1 max but not
    // row-1 max (0.85 at (1,0)); (2,1)=0.7 is row-2 max but not col-1 max;
    // nothing else qualifies.
    assert(got == Set((0L, 0L, 0.9)))
    val m2 = denseMat(Seq(Seq(0.9, 0.1), Seq(0.2, 0.8)))
    assert(cells(SimilarityMatrix.confidentCells(m2)).toSet ==
      Set((0L, 0L, 0.9), (1L, 1L, 0.8)))
  }

  test("confidentCells keeps tied maxima (conflict filter handles them later)") {
    val tied = mat(Seq((0L, 0L, 0.5), (0L, 1L, 0.5), (1L, 0L, 0.1), (1L, 1L, 0.2)))
    val got = cells(SimilarityMatrix.confidentCells(tied)).toSet
    assert(got == Set((0L, 0L, 0.5), (0L, 1L, 0.5)))
  }

  test("oracle: confidentCells agrees with DuckDB") {
    Oracle.assertEquivalent(
      SimilarityMatrix.confidentCells(m)
        .select(col("src"), col("dst"), col("score")),
      """SELECT m.src AS src, m.dst AS dst, CAST(m.score AS DOUBLE) AS score
        |FROM m
        |JOIN (SELECT src, max(CAST(score AS DOUBLE)) AS rmax FROM m GROUP BY src) r
        |  ON m.src = r.src AND CAST(m.score AS DOUBLE) = r.rmax
        |JOIN (SELECT dst, max(CAST(score AS DOUBLE)) AS cmax FROM m GROUP BY dst) c
        |  ON m.dst = c.dst AND CAST(m.score AS DOUBLE) = c.cmax""".stripMargin,
      "m" -> m)
  }

  test("weightedSum combines matrices cell-wise") {
    val a = mat(Seq((0L, 0L, 1.0), (0L, 1L, 0.5)))
    val b = mat(Seq((0L, 0L, 0.2), (0L, 1L, 1.0)))
    val got = cells(SimilarityMatrix.weightedSum(spark, Seq(a -> 0.25, b -> 0.75)))
      .map { case (s, d, v) => (s, d, math.rint(v * 1e9) / 1e9) }.toSet
    assert(got == Set((0L, 0L, 0.4), (0L, 1L, 0.875)))
  }

  test("weightedSum treats missing cells as zero") {
    val a = mat(Seq((0L, 0L, 1.0)))
    val b = mat(Seq((0L, 1L, 1.0)))
    val got = cells(SimilarityMatrix.weightedSum(spark, Seq(a -> 0.5, b -> 0.5))).toSet
    assert(got == Set((0L, 0L, 0.5), (0L, 1L, 0.5)))
  }

  test("oracle: weightedSum agrees with DuckDB full-outer sum") {
    val a = denseMat(Seq(Seq(0.1, 0.9), Seq(0.4, 0.6)))
    val b = denseMat(Seq(Seq(0.7, 0.2), Seq(0.3, 0.8)))
    Oracle.assertEquivalent(
      SimilarityMatrix.weightedSum(spark, Seq(a -> 0.3, b -> 0.7)),
      """SELECT a.src AS src, a.dst AS dst,
        |       0.3 * CAST(a.score AS DOUBLE) + 0.7 * CAST(b.score AS DOUBLE) AS score
        |FROM a JOIN b ON a.src = b.src AND a.dst = b.dst""".stripMargin,
      "a" -> a, "b" -> b)
  }

  test("cosineCross computes pairwise cosine over the domain") {
    val e1 = Seq((0L, Seq(1.0, 0.0)), (1L, Seq(0.0, 1.0))).toDF("id", "vec")
    val e2 = Seq((0L, Seq(1.0, 0.0)), (1L, Seq(1.0, 1.0))).toDF("id", "vec")
    val domain = Seq((0L, 0L), (0L, 1L), (1L, 0L), (1L, 1L))
      .toDF("src", "dst")
    val got = cells(SimilarityMatrix.cosineCross(e1, e2, domain))
      .map { case (s, d, v) => (s, d, math.rint(v * 1e6) / 1e6) }.toSet
    val r2 = math.rint(1e6 / math.sqrt(2.0)) / 1e6
    assert(got == Set((0L, 0L, 1.0), (0L, 1L, r2), (1L, 0L, 0.0), (1L, 1L, r2)))
  }

  test("cosineCross scores missing embeddings as zero") {
    val e1 = Seq((0L, Seq(1.0, 0.0))).toDF("id", "vec")
    val e2 = Seq((5L, Seq(1.0, 0.0))).toDF("id", "vec")
    val domain = Seq((0L, 5L), (0L, 6L), (1L, 5L)).toDF("src", "dst")
    val got = cells(SimilarityMatrix.cosineCross(e1, e2, domain)).toSet
    assert(got == Set((0L, 5L, 1.0), (0L, 6L, 0.0), (1L, 5L, 0.0)))
  }

  test("oracle: cosineCross agrees with DuckDB over exploded vectors") {
    val e1 = Seq((0L, Seq(0.5, 0.5, 0.1)), (1L, Seq(0.9, 0.1, 0.3))).toDF("id", "vec")
    val e2 = Seq((0L, Seq(0.2, 0.8, 0.4)), (1L, Seq(0.3, 0.3, 0.3))).toDF("id", "vec")
    val domain = Seq((0L, 0L), (0L, 1L), (1L, 0L), (1L, 1L)).toDF("src", "dst")
    def exploded(e: org.apache.spark.sql.DataFrame) =
      e.select(col("id"), posexplode(col("vec")).as(Seq("dim", "v")))
    Oracle.assertEquivalent(
      SimilarityMatrix.cosineCross(e1, e2, domain),
      """WITH dots AS (
        |  SELECT a.id AS src, b.id AS dst,
        |         sum(CAST(a.v AS DOUBLE) * CAST(b.v AS DOUBLE)) AS d,
        |         sqrt(sum(CAST(a.v AS DOUBLE) * CAST(a.v AS DOUBLE))) AS na,
        |         sqrt(sum(CAST(b.v AS DOUBLE) * CAST(b.v AS DOUBLE))) AS nb
        |  FROM e1 a JOIN e2 b ON a.dim = b.dim
        |  GROUP BY a.id, b.id)
        |SELECT src, dst, d / (na * nb) AS score FROM dots""".stripMargin,
      "e1" -> exploded(e1), "e2" -> exploded(e2))
  }

  test("testDomain is the full cross product of test pairs") {
    val test = Seq((0L, 0L), (1L, 1L), (2L, 2L)).toDF("src", "dst")
    assert(SimilarityMatrix.testDomain(test).count() == 9)
    assert(SimilarityMatrix.testDomain(test).distinct().count() == 9)
  }

  test("minMaxNormalize maps scores into [0,1] preserving order") {
    val norm = cells(SimilarityMatrix.minMaxNormalize(m))
    assert(norm.map(_._3).min == 0.0)
    assert(norm.map(_._3).max == 1.0)
    val orig = cells(m).sortBy(c => (c._1, c._2)).map(_._3)
    val got = norm.sortBy(c => (c._1, c._2)).map(_._3)
    assert(orig.zip(orig.tail).map { case (a, b) => a < b }
      == got.zip(got.tail).map { case (a, b) => a < b })
  }

  test("minMaxNormalize of a constant matrix is all zero") {
    val const = mat(Seq((0L, 0L, 0.5), (0L, 1L, 0.5)))
    assert(cells(SimilarityMatrix.minMaxNormalize(const)).forall(_._3 == 0.0))
  }
}
