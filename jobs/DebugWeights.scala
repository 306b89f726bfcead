package repro.jobs

import repro.exp.Experiments
import repro.kg.Scenario

/** Diagnostic entrypoint: prints every Table-V ablation accuracy with the
  * effective fusion weights for one sparse close-language pair and one
  * dense distant pair — the two regimes where weight assignment matters
  * most. Useful when re-tuning the benchmark generator.
  */
object DebugWeights {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session("ceaff-debug-weights")
    val scale = Jobs.scaleOf(args)
    for (sc <- Seq(Scenario.SrprsEnFr, Scenario.Dbp15kZhEn)) {
      val b = Experiments.benchmark(spark, sc, scale)
      Experiments.ablationAccuracies(spark, b).foreach { case (n, a) =>
        println(f"${sc.name}%-16s $n%-14s $a%.3f")
      }
      b.unpersistAll()
    }
    spark.stop()
  }
}
