package repro.ml

import scala.util.Random

/** A sparse example: parallel index/value arrays plus a binary label.
  * Used by the text-based baseline simulators (Ditto/AnyMatch/Sudowoodo),
  * whose inputs are hashed bag-of-token vectors.
  */
final case class SparseExample(indices: Array[Int], values: Array[Double], label: Int)

/** Fitted sparse logistic regression model (broadcastable). */
final case class LogisticModel(weights: Array[Double], bias: Double) extends Serializable {
  def score(indices: Array[Int], values: Array[Double]): Double = {
    var z = bias; var i = 0
    while (i < indices.length) { z += weights(indices(i)) * values(i); i += 1 }
    1.0 / (1.0 + math.exp(-z))
  }
  def predict(indices: Array[Int], values: Array[Double]): Int =
    if (score(indices, values) >= 0.5) 1 else 0
}

/** Mini-batch-free SGD trainer for sparse logistic regression.
  *
  * Deliberately does `epochs` full passes over the training data — the
  * baseline simulators use the epoch count to reproduce the *cost shape*
  * of the neural methods they stand in for (Ditto: 10 epochs over the
  * full training pairs; Sudowoodo: many contrastive epochs over all
  * records).
  */
object LogisticRegression {
  def fit(
      data: IndexedSeq[SparseExample],
      dim: Int,
      epochs: Int = 10,
      lr: Double = 0.1,
      l2: Double = 1e-6,
      seed: Long = 0L,
  ): LogisticModel = {
    require(data.nonEmpty, "cannot fit LR on no data")
    val w   = new Array[Double](dim)
    var b   = 0.0
    val rng = new Random(seed)
    val idx = data.indices.toArray
    for (e <- 0 until epochs) {
      // Fisher–Yates shuffle for per-epoch order, deterministic in seed.
      var i = idx.length - 1
      while (i > 0) { val j = rng.nextInt(i + 1); val t = idx(i); idx(i) = idx(j); idx(j) = t; i -= 1 }
      val step = lr / (1.0 + 0.5 * e)
      idx.foreach { k =>
        val ex   = data(k)
        var z    = b; var t = 0
        while (t < ex.indices.length) { z += w(ex.indices(t)) * ex.values(t); t += 1 }
        val p    = 1.0 / (1.0 + math.exp(-z))
        val g    = p - ex.label
        b -= step * g
        t = 0
        while (t < ex.indices.length) {
          val j = ex.indices(t)
          w(j) -= step * (g * ex.values(t) + l2 * w(j))
          t += 1
        }
      }
    }
    LogisticModel(w, b)
  }
}
