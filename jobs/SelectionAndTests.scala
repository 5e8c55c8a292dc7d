package repro.jobs

import repro.eval.Experiments

/** Auxiliary shape checks: the data behind Fig. 7 (distribution-test
  * comparison per AL method) and Fig. 8 (sel_base vs sel_cov with
  * coverage thresholds). Figures are out of scope for the reproduction;
  * these rows are recorded in EXPERIMENTS.md as qualitative checks.
  * `spark-submit --class repro.jobs.SelectionAndTests`.
  */
object SelectionAndTests {
  def main(args: Array[String]): Unit = {
    val spark = JobSpark.session("selection-and-tests")
    println("== Fig. 7 data: distribution tests × AL methods (budget 1000) ==")
    println(Experiments.formatRuns(Experiments.distributionTestSweep(spark)))
    println()
    println("== Fig. 8 data: sel_base vs sel_cov (Bootstrap, budget 1000) ==")
    println(Experiments.formatRuns(Experiments.selectionSweep(spark)))
    spark.stop()
  }
}
