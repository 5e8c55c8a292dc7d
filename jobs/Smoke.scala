package repro.jobs

import org.apache.spark.sql.SparkSession
import org.apache.spark.sql.functions._
import repro.core._
import repro.erdata.MultiSourceGen

/** Development smoke run: generator stats + a tiny MoRER round trip.
  * Not part of the reproduction tables; kept as a quick sanity check
  * (`sbt "runMain repro.jobs.Smoke"`).
  */
object Smoke {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder
      .master("local[*]").appName("smoke")
      .config("spark.sql.shuffle.partitions", "32")
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .config("spark.ui.enabled", false)
      .getOrCreate()
    spark.sparkContext.setLogLevel("WARN")

    for (name <- Seq("dexter", "wdc", "music")) {
      val cfg = name match {
        case "dexter" => MultiSourceGen.dexterConfig(1.0)
        case "wdc"    => MultiSourceGen.wdcConfig(1.0)
        case _        => MultiSourceGen.musicConfig(1.0)
      }
      val t0 = System.nanoTime()
      val ds = MultiSourceGen.generate(spark, cfg)
      ds.pairs.cache()
      val nPairs = ds.pairs.count()
      val nMatch = ds.pairs.filter(col("label") === 1).count()
      val nRec   = ds.records.count()
      val nProb  = ds.pairs.select("problemId").distinct().count()
      println(f"$name%-8s records=$nRec%7d problems=$nProb%4d (expected ${ds.problems.size})" +
        f" pairs=$nPairs%9d matches=$nMatch%8d (${100.0 * nMatch / math.max(1, nPairs)}%.1f%%)" +
        f" gen=${(System.nanoTime() - t0) / 1e9}%.1fs")
      ds.pairs.unpersist()
    }

    // tiny MoRER round trip on a small dexter
    val cfg = MultiSourceGen.dexterConfig(0.3)
    val ds = MultiSourceGen.generate(spark, cfg)
    ds.pairs.cache(); ds.pairs.count()
    val ids = ds.problemIds
    val rng = new scala.util.Random(1)
    val shuffled = rng.shuffle(ids)
    val (init, unsolved) = shuffled.splitAt(ids.size / 2)
    val t0 = System.nanoTime()
    val res = MoRER.run(spark, ds, init, unsolved,
      MoRERConfig(bTot = 300, bMin = 5, alBatch = 30, alInit = 20))
    println(f"MoRER smoke: F1=${res.f1}%.3f labels=${res.labelsSpent} " +
      f"clusters=${res.repo.numClusters} time=${(System.nanoTime() - t0) / 1e9}%.1fs")
    spark.stop()
  }
}
