package repro.jobs

import repro.eval.Experiments

/** Reproduces Table 5 (impact of the initial ER-problem ratio on Dexter:
  * F1 ± std for ratio_init ∈ {30%, 50%} × budgets {1000,1500,2000} ×
  * AL ∈ {Almser, Bootstrap}).
  * `spark-submit --class repro.jobs.Table5InitRatio`.
  */
object Table5InitRatio {
  def main(args: Array[String]): Unit = {
    val spark = JobSpark.session("table5")
    val rows = Experiments.table5(spark)
    println("== Table 5: initial-ratio sweep on Dexter ==")
    println(Experiments.formatTable5(rows))
    spark.stop()
  }
}
