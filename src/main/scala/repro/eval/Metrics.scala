package repro.eval

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** Linkage-quality metrics over prediction DataFrames (columns `label`
  * and `pred`, both 0/1), computed with one aggregation pass.
  */
object Metrics {

  final case class Confusion(tp: Long, fp: Long, fn: Long, tn: Long) {
    def +(o: Confusion): Confusion = Confusion(tp + o.tp, fp + o.fp, fn + o.fn, tn + o.tn)
    def precision: Double = if (tp + fp == 0) 0.0 else tp.toDouble / (tp + fp)
    def recall: Double    = if (tp + fn == 0) 0.0 else tp.toDouble / (tp + fn)
    def f1: Double = {
      val p = precision; val r = recall
      if (p + r == 0) 0.0 else 2 * p * r / (p + r)
    }
    def total: Long = tp + fp + fn + tn
  }
  object Confusion { val empty: Confusion = Confusion(0, 0, 0, 0) }

  /** Confusion counts of a prediction DataFrame. */
  def confusion(df: DataFrame): Confusion = {
    val r = df.agg(
      sum(when(col("label") === 1 && col("pred") === 1, 1).otherwise(0)) as "tp",
      sum(when(col("label") === 0 && col("pred") === 1, 1).otherwise(0)) as "fp",
      sum(when(col("label") === 1 && col("pred") === 0, 1).otherwise(0)) as "fn",
      sum(when(col("label") === 0 && col("pred") === 0, 1).otherwise(0)) as "tn",
    ).collect()(0)
    def g(i: Int): Long = if (r.isNullAt(i)) 0L else r.getLong(i)
    Confusion(g(0), g(1), g(2), g(3))
  }

  /** Sample mean and (population) standard deviation. */
  def meanStd(xs: Seq[Double]): (Double, Double) = {
    if (xs.isEmpty) return (0.0, 0.0)
    val m = xs.sum / xs.size
    val v = xs.map(x => (x - m) * (x - m)).sum / xs.size
    (m, math.sqrt(v))
  }
}
