package repro.al

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.ml.{LabeledVector, PoolVector, RandomForest}

/** The uncertainty AL method of Mozafari et al. (paper §4.4,
  * "Bootstrap"): per iteration, k classifiers are bagged from the
  * current training data; a pool vector's uncertainty is
  * unc(w) = p(1-p) with p the fraction of committee matches (Eq. 10),
  * extended by the IDF-style record-uniqueness score s(w) (Eqs. 11–12).
  *
  * The committee is exactly a k-tree random forest (bagging with
  * replacement); scoring the pool is one distributed pass with the
  * forest broadcast into a UDF — the Spark mapping of "apply stored
  * models over partitioned record pairs".
  */
object BootstrapAL extends ActiveLearner {
  val name = "Bootstrap"

  def select(
      spark: SparkSession,
      pool: DataFrame,
      budget: Int,
      cfg: ALConfig,
      idf: Map[Long, Double],
      seed: Long,
  ): IndexedSeq[PoolVector] = {
    val poolSize = pool.count()
    if (poolSize <= budget) return pool.collect().toIndexedSeq.map(ActiveLearner.toPoolVector)

    var selected = ActiveLearner.warmStart(pool, math.min(cfg.initSize, budget))
    var labeledKeys = selected.map(v => s"${v.problemId}|${v.recA}|${v.recB}").toSet
    val sc = spark.sparkContext

    var iter = 0
    while (selected.size < budget) {
      val batch = math.min(cfg.batchSize, budget - selected.size)
      val train = selected.map(v => LabeledVector(v.features, v.oracleLabel))
      val forest = RandomForest.fit(train, numTrees = cfg.kModels, maxDepth = 6,
        seed = seed * 31 + iter)
      val bForest = sc.broadcast(forest)
      val bIdf    = sc.broadcast(idf)
      val scoreUdf = udf { (features: Seq[Double], recA: Long, recB: Long) =>
        val f   = bForest.value.voteFraction(features.toArray)
        val unc = f * (1.0 - f)
        val s   = ActiveLearner.pairScore(bIdf.value, recA, recB)
        // deterministic micro-jitter breaks ties without an RNG on executors
        val jit = ((recA * 2654435761L + recB) & 0xFFFF).toDouble / 0xFFFF.toDouble * 1e-6
        unc * (1.0 + s) + jit
      }
      val key = concat_ws("|", col("problemId"), col("recA"), col("recB"))
      val picked = pool
        .filter(!key.isin(labeledKeys.toSeq: _*))
        .withColumn("score", scoreUdf(col("features"), col("recA"), col("recB")))
        .orderBy(desc("score"), col("recA"), col("recB"))
        .limit(batch)
        .collect()
        .toIndexedSeq
        .map(ActiveLearner.toPoolVector)
      bForest.destroy(); bIdf.destroy()
      if (picked.isEmpty) return selected
      selected = selected ++ picked
      labeledKeys = labeledKeys ++ picked.map(v => s"${v.problemId}|${v.recA}|${v.recB}")
      iter += 1
    }
    selected
  }
}
