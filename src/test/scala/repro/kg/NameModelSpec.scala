package repro.kg

import org.scalacheck.{Gen, Prop, Test => SCTest}
import org.scalatest.funsuite.AnyFunSuite
import repro.text.Levenshtein

class NameModelSpec extends AnyFunSuite {

  private def check(p: Prop): Unit = {
    val res = SCTest.check(SCTest.Parameters.default.withMinSuccessfulTests(100), p)
    assert(res.passed, res.status.toString)
  }

  private val id: Gen[Long] = Gen.choose(0L, 10000L)

  test("frac is deterministic and in [0,1)") {
    check(Prop.forAll(Gen.alphaNumStr) { k =>
      val f = NameModel.frac(k)
      f == NameModel.frac(k) && f >= 0.0 && f < 1.0
    })
  }

  test("frac is roughly uniform") {
    val n = 20000
    val mean = (0 until n).map(i => NameModel.frac(s"u:$i")).sum / n
    assert(math.abs(mean - 0.5) < 0.02, s"mean=$mean")
  }

  test("concepts are deterministic and non-empty with 1..3 words") {
    check(Prop.forAll(id) { i =>
      val c = NameModel.concepts(i, 1000, 7)
      c == NameModel.concepts(i, 1000, 7) && c.nonEmpty && c.size <= 3
    })
  }

  test("different entities usually have different head concepts") {
    val heads = (0L until 500L).map(i => NameModel.concepts(i, 500, 7).toSet)
    val distinct = heads.distinct.size
    assert(distinct > 400, s"only $distinct distinct concept sets out of 500")
  }

  test("some entities share head words (popular pool) so names can collide") {
    val all = (0L until 1000L).flatMap(i => NameModel.concepts(i, 1000, 7))
    val dupes = all.groupBy(identity).count(_._2.size > 1)
    assert(dupes > 0, "no shared word concepts — collision mechanism broken")
  }

  test("render is deterministic per (concept, lang)") {
    check(Prop.forAll(id) { c =>
      NameModel.render(c + 1, "en") == NameModel.render(c + 1, "en") &&
      NameModel.render(c + 1, "fr") == NameModel.render(c + 1, "fr")
    })
  }

  test("en rendering is syllabic lowercase ascii") {
    check(Prop.forAll(id) { c =>
      NameModel.render(c + 1, "en").forall(ch => ch >= 'a' && ch <= 'z')
    })
  }

  test("distinct concepts render to distinct en tokens") {
    val toks = (1L to 2000L).map(NameModel.render(_, "en"))
    assert(toks.distinct.size == toks.size)
  }

  test("zh/ja renderings share no characters with latin renderings") {
    check(Prop.forAll(id) { c =>
      val en = NameModel.render(c + 1, "en").toSet
      val zh = NameModel.render(c + 1, "zh").toSet
      val ja = NameModel.render(c + 1, "ja").toSet
      en.intersect(zh).isEmpty && en.intersect(ja).isEmpty && zh.intersect(ja).isEmpty
    })
  }

  test("fr/de renderings stay close to en (high Levenshtein ratio)") {
    val ratios = (1L to 300L).map { c =>
      Levenshtein.ratio(NameModel.render(c + 1000000L, "en"), NameModel.render(c + 1000000L, "fr"))
    }
    val mean = ratios.sum / ratios.size
    assert(mean > 0.6 && mean < 0.99, s"EN-FR mean ratio $mean out of intended band")
  }

  test("wd rendering is nearly identical to en") {
    val ratios = (1L to 300L).map { c =>
      Levenshtein.ratio(NameModel.render(c + 1000000L, "en"), NameModel.render(c + 1000000L, "wd"))
    }
    val mean = ratios.sum / ratios.size
    assert(mean > 0.95, s"EN-WD mean ratio $mean too low for a mono-lingual pair")
  }

  test("zh rendering destroys string similarity with en") {
    val ratios = (1L to 300L).map { c =>
      Levenshtein.ratio(NameModel.render(c + 1000000L, "en"), NameModel.render(c + 1000000L, "zh"))
    }
    assert(ratios.sum / ratios.size < 0.05)
  }

  test("unknown language is rejected") {
    intercept[IllegalArgumentException] { NameModel.render(1L, "xx") }
  }

  test("assemble joins with spaces except yg which uses underscores") {
    assert(NameModel.assemble(Seq("ab", "cd"), "en") == "ab cd")
    assert(NameModel.assemble(Seq("ab", "cd"), "yg") == "ab_cd")
  }

  test("degree is >= 1, bounded, deterministic; dense means higher average") {
    check(Prop.forAll(id) { i =>
      val d = NameModel.degree(i, dense = true, 7)
      val s = NameModel.degree(i, dense = false, 7)
      d == NameModel.degree(i, dense = true, 7) && d >= 4 && d <= 10 && s >= 1 && s <= 40
    })
    val n = 2000
    val dMean = (0L until n).map(NameModel.degree(_, dense = true, 7)).sum.toDouble / n
    val sMean = (0L until n).map(NameModel.degree(_, dense = false, 7)).sum.toDouble / n
    assert(dMean > 2 * sMean, s"dense=$dMean sparse=$sMean — density contrast too weak")
  }

  test("target stays in pool and avoids self-loops") {
    check(Prop.forAll(id, Gen.choose(0, 9)) { (i, k) =>
      val t = NameModel.target(i, k, 1000, 7)
      t >= 0 && t < 1000 && (t != i || i >= 1000)
    })
  }

  test("target is hub-biased (low ids over-represented)") {
    val targets = (0L until 2000L).flatMap(i => (0 until 3).map(k => NameModel.target(i, k, 1000, 7)))
    val lowHalf = targets.count(_ < 500).toDouble / targets.size
    assert(lowHalf > 0.6, s"low-id share $lowHalf — preferential attachment missing")
  }

  test("relation ids are stable and within range") {
    check(Prop.forAll(id, id) { (a, b) =>
      val r = NameModel.relation(a, b, 20, 7)
      r == NameModel.relation(a, b, 20, 7) && r >= 0 && r < 20
    })
  }

  test("edge keep rate matches EdgeKeepRate per side, independent across sides") {
    val r = NameModel.EdgeKeepRate
    val pairs = (0L until 3000L).map(i => (i, i + 1))
    val k1 = pairs.count { case (a, b) => NameModel.keptIn(a, b, 1, 7) }.toDouble / pairs.size
    val k2 = pairs.count { case (a, b) => NameModel.keptIn(a, b, 2, 7) }.toDouble / pairs.size
    val both = pairs.count { case (a, b) =>
      NameModel.keptIn(a, b, 1, 7) && NameModel.keptIn(a, b, 2, 7)
    }.toDouble / pairs.size
    assert(math.abs(k1 - r) < 0.03 && math.abs(k2 - r) < 0.03)
    assert(math.abs(both - r * r) < 0.04, s"joint=$both — sides not independent")
  }
}
