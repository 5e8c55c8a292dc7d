package repro.bench

import repro.SparkSpec
import repro.eval.Experiments

/** Table 2 — dataset statistics at paper scale (sf=1).
  *
  * Paper: Dexter 276 problems / 1,100K pairs / 368K matches;
  *        WDC-computer 12 / 74.5K / 4.8K; Music 20 / 385.9K / 16.2K.
  * The synthetic analogues must reproduce the topology exactly
  * (#problems) and the scale/match-skew approximately (see DESIGN.md §3).
  */
class Table2DatasetStatsBench extends SparkSpec {

  private lazy val stats = Experiments.table2(spark, sf = 1.0)
  private def of(name: String) = stats.find(_.name == name).get

  test("print Table 2") {
    println("== Table 2: dataset statistics (ours vs paper) ==")
    val paper = Map(
      "dexter" -> (276L, 1100000L, 368000L),
      "wdc"    -> (12L, 74500L, 4800L),
      "music"  -> (20L, 385900L, 16200L))
    stats.foreach { s =>
      val (pp, pr, pm) = paper(s.name)
      println(f"${s.name}%-8s problems=${s.problems}%4d (paper $pp%4d)  " +
        f"pairs=${s.pairs}%9d (paper $pr%9d)  matches=${s.matches}%8d (paper $pm%8d)  " +
        f"ratio=${100.0 * s.matches / s.pairs}%.1f%% (paper ${100.0 * pm / pr}%.1f%%)")
    }
  }

  test("ER problem counts match the paper exactly") {
    assert(of("dexter").problems == 276)
    assert(of("wdc").problems == 12)
    assert(of("music").problems == 20)
  }

  test("pair counts are the paper's order of magnitude") {
    assert(of("dexter").pairs > 400000 && of("dexter").pairs < 2500000)
    assert(of("wdc").pairs > 25000 && of("wdc").pairs < 160000)
    assert(of("music").pairs > 150000 && of("music").pairs < 800000)
  }

  test("match skew reproduces the paper's shape (dexter match-rich, wdc/music skewed)") {
    def ratio(n: String) = of(n).matches.toDouble / of(n).pairs
    assert(ratio("dexter") > 0.15 && ratio("dexter") < 0.55, s"dexter ${ratio("dexter")}")
    assert(ratio("wdc") > 0.02 && ratio("wdc") < 0.15, s"wdc ${ratio("wdc")}")
    assert(ratio("music") > 0.02 && ratio("music") < 0.12, s"music ${ratio("music")}")
    assert(ratio("dexter") > 3 * ratio("music"))
  }
}
