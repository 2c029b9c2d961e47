package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.benchlib._

/** Figs 10 + 11: compression-ratio comparison over all codecs, datasets,
  * batch sizes and error bounds. */
class RatioBench extends AnyFunSuite {

  private lazy val cells = RatioTables.cells()

  test("Fig 11: compression ratio table") {
    println(RatioTables.ratios(cells))
    println(RatioTables.improvements(cells))
  }

  test("Fig 10: CD-diagram analog (mean rank)") {
    val t = RatioTables.ranking(cells)
    println(t)
    val firstRow = t.linesIterator.drop(3).next()
    assert(firstRow.contains("LCP"), s"LCP must rank first overall, got: $firstRow")
  }

  test("Fig 11 shape: LCP has the highest CR on every dataset at batch 16 (mean over ebs)") {
    for (ds <- BenchData.multiFrame.map(_._1)) {
      val mine = cells.filter(c => c.dataset == ds && c.batch == 16)
      val mean = BenchData.codecs.map(_.name)
        .map(n => n -> mine.map(_.crByCodec(n)).sum / mine.size).toMap
      val second = (mean - "LCP").values.max
      assert(mean("LCP") > second, s"$ds: LCP ${mean("LCP")} vs second $second")
    }
  }

  test("Fig 11 shape: larger batch never hurts LCP (longer temporal domain)") {
    for (ds <- BenchData.multiFrame.map(_._1); eb <- BenchData.PaperEbs) {
      val b8  = cells.find(c => c.dataset == ds && c.batch == 8 && c.eb == eb).get.crByCodec("LCP")
      val b16 = cells.find(c => c.dataset == ds && c.batch == 16 && c.eb == eb).get.crByCodec("LCP")
      assert(b16 >= b8 * 0.98, s"$ds eb=$eb: batch16 $b16 < batch8 $b8")
    }
  }

  test("Fig 11 shape: higher error bound gives higher CR for LCP") {
    for (ds <- BenchData.multiFrame.map(_._1)) {
      val by = BenchData.PaperEbs.map(eb =>
        cells.find(c => c.dataset == ds && c.batch == 16 && c.eb == eb).get.crByCodec("LCP"))
      assert(by(0) > by(1) && by(1) > by(2), s"$ds: CR not monotone in eb: $by")
    }
  }
}
