package repro.benchlib

import repro.baselines.LcpCodec
import repro.core.{BlockSizeOpt, Lcp, LcpS}
import repro.metrics.Metrics

/** Figures 5–7: the dynamic-optimization studies of §7.4. */
object OptTables {

  /** Fig. 5: LCP-S compressed size vs block size p (two contrasting sets). */
  def blockSizeSweep(eb: Double = 1e-2): String = {
    val inputs = Seq("Copper", "3DEP").map(n => n -> BenchData.singleFrame.find(_._1 == n).get._2)
    val rows = Par.map(for { (ds, f) <- inputs; p <- BlockSizeOpt.Candidates } yield (ds, f, p)) {
      case (ds, f, p) =>
        val r = LcpS.compress(f, eb, p)
        Seq(ds, p.toString, TableFmt.bytes(r.bytes.length.toLong),
          TableFmt.f3(Metrics.bitRate(Seq(f), r.bytes.length.toLong)))
    }
    TableFmt.render(s"Fig 5: LCP-S size vs block size p (eb=$eb)",
      Seq("Dataset", "p", "Compressed size", "Bit rate"), rows)
  }

  /** Fig. 6: CR of the sampled optimizer relative to exhaustive search. */
  def optimizerEffectiveness(): String = {
    val combos = for { (ds, f) <- BenchData.singleFrame; eb <- BenchData.PaperEbs } yield (ds, f, eb)
    val rows = Par.map(combos) { case (ds, f, eb) =>
      val (pOpt, _) = BlockSizeOpt.bestBlockSize(f, eb)
      val sizeOpt  = LcpS.compress(f, eb, pOpt).bytes.length.toDouble
      val sizeBest = BlockSizeOpt.Candidates.map(p => LcpS.compress(f, eb, p).bytes.length).min.toDouble
      Seq(ds, TableFmt.sci(eb), pOpt.toString, f"${sizeBest / sizeOpt * 100}%.1f%%")
    }
    TableFmt.render("Fig 6: optimized block size CR as % of best exhaustive CR (target >= 85%)",
      Seq("Dataset", "eb", "Chosen p", "CR / best CR"), rows)
  }

  /** Fig. 7: overall CR vs anchor error-bound scale factor. The effect
    * concentrates where motion ≪ eb (anchor quantization error dominates
    * the temporal residuals of anchor-dependent batch heads), i.e. coarse
    * bounds — the paper likewise reports gains "when the bit rate is
    * small". */
  def ebScaleSweep(eb: Double = 1e-1, batchSize: Int = 2): String = {
    val factors = Seq(1.0, 2.0, 5.0, 10.0, 20.0)
    // Diffusive datasets in the coarse-eb regime: anchor quantization error
    // dominates the batch heads' temporal residuals, the case §7.4.2
    // targets (vibration-around-sites Copper compresses its heads almost
    // for free either way, so scaling cannot pay there — see EXPERIMENTS).
    val inputs  = BenchData.multiFrame.filter(t => t._1 == "Helium" || t._1 == "LJ")
    val rows = Par.map(for { (ds, frames) <- inputs; factor <- factors } yield (ds, frames, factor)) {
      case (ds, frames, factor) =>
        val codec = new LcpCodec(s"LCP(x$factor)", None, Lcp.Forced(factor))
        val c = codec.compress(frames, eb, batchSize)
        Seq(ds, factor.toString, TableFmt.f2(Metrics.compressionRatio(frames, c.payload.length.toLong)))
    }
    TableFmt.render(s"Fig 7: CR vs anchor eb scale factor (eb=$eb, batch=$batchSize; paper picks 5)",
      Seq("Dataset", "Scale factor", "CR"), rows)
  }
}
