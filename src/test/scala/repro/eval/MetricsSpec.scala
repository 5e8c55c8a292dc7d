package repro.eval

import repro.{Oracle, SparkSpec}

class MetricsSpec extends SparkSpec {
  import spark.implicits._
  import Metrics._

  test("confusion counts match a hand-built table") {
    val df = Seq((1, 1), (1, 1), (1, 0), (0, 1), (0, 0), (0, 0)).toDF("label", "pred")
    assert(confusion(df) == Confusion(tp = 2, fp = 1, fn = 1, tn = 2))
  }

  test("confusion matches DuckDB (oracle)") {
    val rng = new scala.util.Random(1)
    val df = Seq.fill(500)((rng.nextInt(2), rng.nextInt(2))).toDF("label", "pred")
    val c = confusion(df)
    val sparkDf = Seq((c.tp, c.fp, c.fn, c.tn)).toDF("tp", "fp", "fn", "tn")
    Oracle.assertEquivalent(
      sparkDf,
      """SELECT
        |  count(*) FILTER (WHERE label='1' AND pred='1') AS tp,
        |  count(*) FILTER (WHERE label='0' AND pred='1') AS fp,
        |  count(*) FILTER (WHERE label='1' AND pred='0') AS fn,
        |  count(*) FILTER (WHERE label='0' AND pred='0') AS tn
        |FROM t""".stripMargin,
      "t" -> df)
  }

  test("empty prediction set yields zero confusion and F1 0") {
    val df = Seq.empty[(Int, Int)].toDF("label", "pred")
    val c = confusion(df)
    assert(c == Confusion.empty && c.f1 == 0.0)
  }

  test("perfect predictions give F1 1") {
    assert(Confusion(10, 0, 0, 5).f1 == 1.0)
  }

  test("precision and recall formulas") {
    val c = Confusion(tp = 6, fp = 2, fn = 4, tn = 8)
    assert(math.abs(c.precision - 0.75) < 1e-12)
    assert(math.abs(c.recall - 0.6) < 1e-12)
    assert(math.abs(c.f1 - 2 * 0.75 * 0.6 / 1.35) < 1e-12)
  }

  test("degenerate denominators give 0 not NaN") {
    assert(Confusion(0, 0, 0, 5).precision == 0.0)
    assert(Confusion(0, 0, 0, 5).recall == 0.0)
    assert(Confusion(0, 0, 0, 5).f1 == 0.0)
  }

  test("confusion addition is componentwise") {
    val a = Confusion(1, 2, 3, 4); val b = Confusion(10, 20, 30, 40)
    assert(a + b == Confusion(11, 22, 33, 44))
  }

  test("meanStd of constant sequence is (c, 0)") {
    assert(meanStd(Seq(2.0, 2.0, 2.0)) == (2.0, 0.0))
  }

  test("meanStd matches a hand computation") {
    val (m, s) = meanStd(Seq(1.0, 3.0))
    assert(m == 2.0 && math.abs(s - 1.0) < 1e-12)
  }

  test("meanStd of empty is (0,0)") {
    assert(meanStd(Nil) == (0.0, 0.0))
  }
}
