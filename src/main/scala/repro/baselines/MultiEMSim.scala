package repro.baselines

import org.apache.spark.sql.SparkSession
import org.apache.spark.sql.functions._
import repro.erdata.ERDataset
import repro.eval.Metrics
import repro.eval.Metrics.Confusion
import repro.ml.TextFeatures

/** Simulator for MultiEM (Zeng et al., ICDE 2024) — unsupervised
  * multi-table matching with pre-trained embeddings and hierarchical
  * source merging. Substitution (DESIGN.md §3): hashed bag-of-token
  * embeddings with plain cosine similarity, the decision threshold m
  * grid-searched and — as in the paper's own protocol — the best test
  * configuration reported. No training phase, so it is the fastest
  * method; a single global threshold over heterogeneous sources is also
  * why it trails the supervised methods on Dexter/WDC.
  */
object MultiEMSim {
  val Dim = 1 << 13
  val Grid: Seq[Double] = (5 to 19).map(_ * 0.05)

  def run(
      spark: SparkSession,
      ds: ERDataset,
      testIds: Seq[String],
      seed: Long = 7,
  ): Confusion = {
    val simUdf = udf { (aText: String, bText: String) =>
      val (ia, va) = TextFeatures.hashed(TextFeatures.tokens(aText), Dim)
      val (ib, vb) = TextFeatures.hashed(TextFeatures.tokens(bText), Dim)
      TextFeatures.cosine(ia, va, ib, vb)
    }
    val scored = BaselineUtil.textPairs(BaselineUtil.filterProblems(ds.pairs, testIds))
      .withColumn("sim", simUdf(col("aText"), col("bText")))
      .cache()
    try {
      val best = Grid.map { t =>
        val conf = Metrics.confusion(
          scored.withColumn("pred", (col("sim") >= t).cast("int")))
        (t, conf)
      }.maxBy(_._2.f1)
      best._2
    } finally scored.unpersist()
  }
}
