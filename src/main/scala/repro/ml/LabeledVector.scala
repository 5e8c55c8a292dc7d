package repro.ml

/** A dense similarity feature vector with a binary label.
  *
  * This is the unit of training data throughout the reproduction: one
  * record pair, its similarity features (each in [0,1]), and the
  * match/non-match label (1/0). AL methods additionally carry the pair's
  * identity so labeling can be charged against the budget exactly once.
  */
final case class LabeledVector(features: Array[Double], label: Int) {
  require(label == 0 || label == 1, s"binary label expected, got $label")
}

/** An unlabeled pool vector: pair identity + features, label unknown
  * until the (simulated) labeling oracle is asked.
  */
final case class PoolVector(
    problemId: String,
    recA: Long,
    recB: Long,
    features: Array[Double],
    /** Ground-truth label, revealed only when the AL method "pays" for it. */
    oracleLabel: Int,
)
