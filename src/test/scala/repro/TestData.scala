package repro

import org.apache.spark.sql.SparkSession
import repro.erdata._

/** Tiny deterministic corpora shared across suites (generated once per
  * test JVM — parallelExecution is off, so suites reuse these safely).
  */
object TestData {

  /** 4 camera sources with duplicates + self problems → 10 ER problems. */
  def tinyCameraConfig(seed: Long = 5): GenConfig = GenConfig(
    name = "tiny", domain = CameraDomain, nSources = 4,
    nEntities = 150, presence = 0.85, dupRate = 0.25,
    profiles = IndexedSeq(
      CorruptionProfile(0.005, 0.03, 0.01, 0.01, 0.01),
      CorruptionProfile(0.05, 0.25, 0.10, 0.10, 0.10)),
    splitHalves = false, selfProblems = true, seed = seed)

  /** 4 music sources, train/test halves → 12 ER problems. */
  def tinyMusicConfig(seed: Long = 6): GenConfig = GenConfig(
    name = "tinymusic", domain = MusicDomain, nSources = 4,
    nEntities = 400, presence = 0.6, dupRate = 0.0,
    profiles = IndexedSeq(CorruptionProfile(0.02, 0.08, 0.05, 0.04, 0.03)),
    splitHalves = true, selfProblems = false, seed = seed)

  lazy val camera: ERDataset = {
    val ds = MultiSourceGen.generate(spark, tinyCameraConfig())
    ds.pairs.cache(); ds.pairs.count()
    ds
  }

  lazy val music: ERDataset = {
    val ds = MultiSourceGen.generate(spark, tinyMusicConfig())
    ds.pairs.cache(); ds.pairs.count()
    ds
  }

  private def spark: SparkSession = SparkSpec.shared
}
