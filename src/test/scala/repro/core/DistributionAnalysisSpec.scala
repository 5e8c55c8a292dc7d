package repro.core

import repro.{Oracle, SparkSpec, TestData}

class DistributionAnalysisSpec extends SparkSpec {

  private def hist(id: String, bins: Array[Long], std: Double = 0.2): FeatureHistogram =
    FeatureHistogram(id, 0, bins, bins.sum, 0.5, std)

  private val uniform4 = hist("u", Array(10L, 10L, 10L, 10L))
  private val pointLow = hist("p0", Array(40L, 0L, 0L, 0L))
  private val pointHigh = hist("p1", Array(0L, 0L, 0L, 40L))

  // ------------------------------------------------------------- CDF/props

  test("cdf is monotone and ends at 1") {
    val c = uniform4.cdf
    assert(c.zip(c.tail).forall { case (a, b) => a <= b })
    assert(math.abs(c.last - 1.0) < 1e-12)
  }

  test("cdf of empty histogram is all zeros") {
    assert(hist("e", Array(0L, 0L, 0L, 0L)).cdf.forall(_ == 0.0))
  }

  test("props are smoothed away from zero") {
    assert(pointLow.props().forall(_ >= 1e-4))
  }

  test("props sum to ~1 for well-populated histograms") {
    assert(math.abs(uniform4.props().sum - 1.0) < 1e-2)
  }

  // --------------------------------------------------------------- tests

  test("KS similarity of identical distributions is 1") {
    assert(math.abs(KS.similarity(uniform4, uniform4) - 1.0) < 1e-12)
  }

  test("KS similarity of opposite point masses is ~0") {
    assert(KS.similarity(pointLow, pointHigh) < 0.01)
  }

  test("KS is symmetric") {
    assert(math.abs(KS.similarity(uniform4, pointLow) - KS.similarity(pointLow, uniform4)) < 1e-12)
  }

  test("WD similarity of identical distributions is 1") {
    assert(math.abs(WD.similarity(uniform4, uniform4) - 1.0) < 1e-12)
  }

  test("WD similarity of opposite point masses is low") {
    assert(WD.similarity(pointLow, pointHigh) < 0.3)
  }

  test("WD is symmetric") {
    assert(math.abs(WD.similarity(uniform4, pointHigh) - WD.similarity(pointHigh, uniform4)) < 1e-12)
  }

  test("WD similarity is higher for closer distributions") {
    val near = hist("n", Array(35L, 5L, 0L, 0L))
    assert(WD.similarity(pointLow, near) > WD.similarity(pointLow, pointHigh))
  }

  test("PSI similarity of identical distributions is 1") {
    assert(math.abs(PSI.similarity(uniform4, uniform4) - 1.0) < 1e-12)
  }

  test("PSI is symmetric (the (p-q)ln(p/q) form)") {
    assert(math.abs(PSI.similarity(uniform4, pointLow) - PSI.similarity(pointLow, uniform4)) < 1e-12)
  }

  test("PSI similarity decreases with distribution shift") {
    val near = hist("n", Array(12L, 10L, 9L, 9L))
    assert(PSI.similarity(uniform4, near) > PSI.similarity(uniform4, pointHigh))
  }

  test("all test similarities are in [0,1]") {
    for (t <- DistTest.all; (a, b) <- Seq((uniform4, pointLow), (pointLow, pointHigh))) {
      val s = t.similarity(a, b)
      assert(s >= 0.0 && s <= 1.0, s"${t.name}: $s")
    }
  }

  test("DistTest.byName resolves all tests, case-insensitively") {
    assert(DistTest.byName("ks") == KS)
    assert(DistTest.byName("WD") == WD)
    assert(DistTest.byName("psi") == PSI)
    assertThrows[IllegalArgumentException](DistTest.byName("nope"))
  }

  // -------------------------------------------------- problem similarity

  test("problemSimilarity of a problem with itself is 1") {
    val hs = IndexedSeq(uniform4, hist("x", Array(5L, 10L, 15L, 10L)))
    for (t <- DistTest.all)
      assert(math.abs(DistributionAnalysis.problemSimilarity(hs, hs, t) - 1.0) < 1e-9)
  }

  test("problemSimilarity weights features by std") {
    // feature 0 identical (high std), feature 1 very different (tiny std):
    // weighting by std should keep similarity high
    val a = IndexedSeq(hist("a0", Array(10L, 10L, 10L, 10L), std = 0.4),
                       hist("a1", Array(40L, 0L, 0L, 0L), std = 0.001))
    val b = IndexedSeq(hist("b0", Array(10L, 10L, 10L, 10L), std = 0.4),
                       hist("b1", Array(0L, 0L, 0L, 40L), std = 0.001))
    val s = DistributionAnalysis.problemSimilarity(a, b, KS)
    assert(s > 0.95, s"std weighting failed: $s")
  }

  test("problemSimilarity rejects mismatched feature spaces") {
    assertThrows[IllegalArgumentException](
      DistributionAnalysis.problemSimilarity(IndexedSeq(uniform4), IndexedSeq.empty, KS))
  }

  test("problemSimilarity falls back to the unweighted mean when all stds are 0") {
    val a = IndexedSeq(hist("a", Array(10L, 0L, 0L, 0L), std = 0.0))
    val b = IndexedSeq(hist("b", Array(10L, 0L, 0L, 0L), std = 0.0))
    assert(math.abs(DistributionAnalysis.problemSimilarity(a, b, KS) - 1.0) < 1e-9)
  }

  // --------------------------------------------- distributed histograms

  test("histograms cover every problem and feature of the tiny corpus") {
    val ds = TestData.camera
    val hs = DistributionAnalysis.histograms(ds.pairs, ds.numFeatures, 20)
    assert(hs.keySet == ds.pairs.select("problemId").distinct().collect().map(_.getString(0)).toSet)
    hs.values.foreach(h => assert(h.size == ds.numFeatures))
  }

  test("histogram totals equal the problem pair counts") {
    val ds = TestData.camera
    val hs = DistributionAnalysis.histograms(ds.pairs, ds.numFeatures, 20)
    val counts = ds.pairs.groupBy("problemId").count().collect()
      .map(r => r.getString(0) -> r.getLong(1)).toMap
    hs.foreach { case (pid, fh) =>
      fh.foreach(h => assert(h.total == counts(pid), s"$pid feature ${h.feature}"))
    }
  }

  test("histogram bin counts match DuckDB binning (oracle)") {
    import org.apache.spark.sql.functions._
    val ds = TestData.camera
    val one = ds.pairs
      .select(col("problemId"), col("features").getItem(0) as "v")
    val sparkBins = one
      .withColumn("bin", least(floor(col("v") * 10).cast("int"), lit(9)))
      .groupBy("problemId", "bin").agg(count(lit(1)) as "cnt")
    Oracle.assertEquivalent(
      sparkBins,
      """SELECT problemId,
        |       LEAST(CAST(FLOOR(CAST(v AS DOUBLE) * 10) AS INT), 9) AS bin,
        |       count(*) AS cnt
        |FROM vals GROUP BY 1, 2""".stripMargin,
      "vals" -> one)
  }

  test("histogram mean/std agree with direct aggregation") {
    import org.apache.spark.sql.functions._
    val ds = TestData.camera
    val hs = DistributionAnalysis.histograms(ds.pairs, ds.numFeatures, 20)
    val pid = hs.keys.min
    val r = ds.pairs.filter(col("problemId") === pid)
      .agg(avg(col("features").getItem(0)), stddev_pop(col("features").getItem(0)))
      .collect()(0)
    assert(math.abs(hs(pid)(0).mean - r.getDouble(0)) < 1e-9)
    assert(math.abs(hs(pid)(0).std - r.getDouble(1)) < 1e-9)
  }

  test("histogramOfVectors matches the distributed histogram on the same data") {
    import org.apache.spark.sql.functions._
    val ds = TestData.camera
    val pid = ds.problemIds.head
    val sub = ds.pairs.filter(col("problemId") === pid)
    val dist = DistributionAnalysis.histograms(sub, ds.numFeatures, 10)(pid)
    val vecs = sub.select("features").collect().map(_.getSeq[Double](0).toArray).toSeq
    val local = DistributionAnalysis.histogramOfVectors(pid, vecs, ds.numFeatures, 10)
    dist.zip(local).foreach { case (d, l) =>
      assert(d.bins.toSeq == l.bins.toSeq)
      assert(math.abs(d.mean - l.mean) < 1e-9)
      assert(math.abs(d.std - l.std) < 1e-9)
    }
  }

  test("value 1.0 lands in the last bin (no out-of-range bin)") {
    val h = DistributionAnalysis.histogramOfVectors("x", Seq(Array(1.0), Array(0.0)), 1, 10)
    assert(h(0).bins(9) == 1 && h(0).bins(0) == 1)
  }
}
