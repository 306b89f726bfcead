package repro.core

import repro.kg.{BenchmarkGen, Scenario}
import repro.{Fixtures, SparkSpec}

class BaselinesSpec extends SparkSpec with Fixtures {

  private lazy val dense = BenchmarkGen
    .generate(spark, Scenario.Dbp15kFrEn, nGold = 150, nFringe = 50, seed = 7).cached()

  test("every roster baseline produces a full test-domain matrix") {
    val n = dense.test.count()
    Baselines.names.foreach { name =>
      val m = Baselines.matrix(spark, dense, name)
      assert(m.count() == n * n, s"$name matrix incomplete")
    }
  }

  test("unknown baseline name is rejected") {
    intercept[IllegalArgumentException] { Baselines.matrix(spark, dense, "nope") }
  }

  test("depth pays off more on sparse KGs than on dense ones (RSNs-on-SRPRS shape)") {
    // On dense KGs the 1-hop seed fingerprint is already sharp; on sparse
    // KGs long-range propagation is what recovers signal — the paper's
    // observation that RSNs overtakes shallow-structure methods on SRPRS.
    val sparse = BenchmarkGen
      .generate(spark, Scenario.SrprsEnFr, nGold = 150, nFringe = 50, seed = 7).cached()
    val gainDense = Baselines.accuracy(spark, dense, "structStandard") -
      Baselines.accuracy(spark, dense, "structShallow")
    val gainSparse = Baselines.accuracy(spark, sparse, "structStandard") -
      Baselines.accuracy(spark, sparse, "structShallow")
    assert(gainSparse > gainDense,
      s"depth gain sparse=$gainSparse should exceed dense=$gainDense")
    sparse.unpersistAll()
  }

  test("bootstrapping does not collapse the structural signal") {
    val standard = Baselines.accuracy(spark, dense, "structStandard")
    val boot = Baselines.accuracy(spark, dense, "structBootstrap")
    assert(boot >= standard - 0.1, s"bootstrap $boot vs standard $standard")
  }

  test("representation-level name fusion beats structure-only (paper's 2nd group > 1st group)") {
    val rep = Baselines.accuracy(spark, dense, "repFusion")
    val structOnly = Baselines.accuracy(spark, dense, "structStandard")
    assert(rep > structOnly, s"repFusion $rep vs structOnly $structOnly")
  }

  test("baseline accuracies are within [0,1]") {
    Baselines.names.foreach { name =>
      val a = Baselines.accuracy(spark, dense, name)
      assert(a >= 0.0 && a <= 1.0, s"$name accuracy $a")
    }
  }
}
