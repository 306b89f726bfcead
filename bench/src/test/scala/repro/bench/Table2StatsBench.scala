package repro.bench

import repro.exp.Experiments
import repro.kg.Scenario

/** Table II — statistics of the generated evaluation benchmark. */
class Table2StatsBench extends BenchSpec {

  test("Table II: benchmark statistics") {
    val stats = Experiments.table2(spark, scale)
    emit("Table II — benchmark statistics", Experiments.formatStats(stats))

    assert(stats.map(_.dataset) == Scenario.all.map(_.name))
    stats.foreach { s =>
      // both KGs are non-trivial and every gold pair is split 30/70-ish
      assert(s.triples1 > 0 && s.triples2 > 0, s.dataset)
      assert(s.seedPairs + s.testPairs == s.goldPairs, s.dataset)
      val frac = s.seedPairs.toDouble / s.goldPairs
      assert(frac > 0.2 && frac < 0.4, s"${s.dataset} seed fraction $frac")
    }
    // density shape: DBP15K/DBP100K-like KGs are denser than SRPRS-like
    val byName = stats.map(s => s.dataset -> s).toMap
    val denseDeg = byName("DBP15K_ZH-EN").triples1.toDouble / byName("DBP15K_ZH-EN").entities1
    val sparseDeg = byName("SRPRS_EN-FR").triples1.toDouble / byName("SRPRS_EN-FR").entities1
    assert(denseDeg > 1.5 * sparseDeg,
      s"dense avg degree $denseDeg vs sparse $sparseDeg — density contrast missing")
    // paper shape: DBP100K datasets are the largest
    assert(byName("DBP100K_DBP-WD").entities1 > byName("DBP15K_ZH-EN").entities1)
    assert(byName("DBP15K_ZH-EN").entities1 > byName("SRPRS_EN-FR").entities1)
  }
}
