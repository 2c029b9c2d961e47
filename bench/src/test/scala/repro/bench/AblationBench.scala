package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.benchlib._
import repro.metrics.Metrics

/** Fig 8 (ablation) + Fig 9 (error distribution). */
class AblationBench extends AnyFunSuite {

  test("Fig 8: ablation table") {
    println(AblationTables.ablation())
  }

  test("Fig 8 shape: each stage helps (BLK universally, T on coherent data)") {
    for ((ds, frames) <- BenchData.multiFrame) {
      val eb = 1e-2
      val sizes = Par.map(AblationTables.variants) { case (vn, codec) =>
        vn -> codec.compress(frames, eb, 16).payload.length.toLong
      }.toMap
      // Dynamic block size never hurts beyond sampling noise (Fig 8 line 2).
      assert(sizes("LCP-S+BLK") <= sizes("LCP-S") * 1.05, s"$ds: BLK hurt")
      // The temporal hybrid never loses to spatial-only: the FSM falls back
      // to LCP-S when LCP-T does not pay (Fig 8 line 3).
      assert(sizes("LCP-S+BLK+T") <= sizes("LCP-S+BLK") * 1.02, s"$ds: hybrid hurt")
      // Full LCP stays within noise of the best ablation stage.
      assert(sizes("LCP-S+BLK+T+EB") <= sizes("LCP-S+BLK+T") * 1.05, s"$ds: EB scaling hurt")
    }
  }

  test("Fig 8 shape: temporal stage is a large win on the diffusive MD sets") {
    // Helium/LJ: particles drift, so only the temporal domain shrinks the
    // data at coarse bounds. (Vibration-regime Copper compresses spatially
    // almost for free at eb=1e-1 and the FSM rightly keeps LCP-S there.)
    for (ds <- Seq("Helium", "LJ")) {
      val frames = BenchData.multiFrame.find(_._1 == ds).get._2
      val eb = 1e-1 // coarse bound: frame-to-frame motion within a few bins
      val blk  = AblationTables.variants(1)._2.compress(frames, eb, 16).payload.length
      val full = AblationTables.variants(3)._2.compress(frames, eb, 16).payload.length
      assert(full < blk / 2, s"$ds: temporal should win big at coarse eb ($full vs $blk)")
    }
  }

  test("Fig 9: error distribution, max error within bound") {
    val t = AblationTables.errorDistribution()
    println(t)
    assert(t.contains("<= eb"))
  }

  test("Fig 9 shape: LCP max error obeys the bound on Helium at eb=0.1") {
    val frames = BenchData.multiFrame.find(_._1 == "Helium").get._2
    val codec  = repro.baselines.LcpCodec.full
    val c      = codec.compress(frames, 0.1, 16)
    val dec    = codec.decompress(c.payload)
    frames.indices.foreach { t =>
      assert(Metrics.withinBound(Metrics.maxAbsError(frames(t), dec(t), c.perms(t)), 0.1))
    }
  }
}
