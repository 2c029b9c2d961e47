package repro.benchlib

import repro.core.Frame
import repro.metrics.Metrics

/** Figures 12 (single-frame) and 13 (multi-frame) rate-distortion tables. */
object RateDistortionTables {

  val SweepEbs: Seq[Double] = Seq(1e-1, 2e-2, 1e-2, 2e-3)

  private def rdRow(frames: IndexedSeq[Frame], codecName: String,
                    codec: repro.baselines.ParticleCodec, eb: Double, batch: Int): (Double, Double) = {
    val c   = codec.compress(frames, eb, batch)
    val dec = codec.decompress(c.payload)
    val br  = Metrics.bitRate(frames, c.payload.length.toLong)
    val ps  = Metrics.psnr(frames, dec, c.perms)
    (br, ps)
  }

  /** Fig. 12: single-frame rate-distortion on all eight datasets. */
  def singleFrame(): String = {
    val combos = for {
      (ds, f) <- BenchData.singleFrame
      codec <- BenchData.codecs
      eb <- SweepEbs
    } yield (ds, f, codec, eb)
    val rows = Par.map(combos) { case (ds, f, codec, eb) =>
      val (br, ps) = rdRow(IndexedSeq(f), codec.name, codec, eb, 1)
      Seq(ds, codec.name, TableFmt.sci(eb), TableFmt.f3(br), TableFmt.f1(ps))
    }
    TableFmt.render("Fig 12: single-frame rate-distortion (lower bit rate + higher PSNR = better)",
      Seq("Dataset", "Compressor", "eb", "Bit rate", "PSNR dB"), rows)
  }

  /** Fig. 13: multi-frame rate-distortion at batch 16. */
  def multiFrame(): String = {
    val combos = for {
      (ds, frames) <- BenchData.multiFrame
      codec <- BenchData.codecs
      eb <- SweepEbs
    } yield (ds, frames, codec, eb)
    val rows = Par.map(combos) { case (ds, frames, codec, eb) =>
      val (br, ps) = rdRow(frames, codec.name, codec, eb, 16)
      Seq(ds, codec.name, TableFmt.sci(eb), TableFmt.f3(br), TableFmt.f1(ps))
    }
    TableFmt.render("Fig 13: multi-frame rate-distortion (batch = 16)",
      Seq("Dataset", "Compressor", "eb", "Bit rate", "PSNR dB"), rows)
  }

  /** The §8.2.4 comparison: PSNR at the *same* bit rate (a vertical slice
    * of the rate-distortion plot; paper quotes LCP up to +34 dB single /
    * +35 dB multi over the second best). LCP is evaluated at the middle
    * sweep eb; each baseline's PSNR at LCP's bit rate is linearly
    * interpolated on its own sweep curve (clamped to its endpoints, which
    * only favours the baseline). */
  def psnrAdvantage(): String = {
    val rows = Par.map(BenchData.singleFrame) { case (ds, f) =>
      val frames = IndexedSeq(f)
      val eb = SweepEbs(2)
      val (lcpBr, lcpPs) = rdRow(frames, "LCP", BenchData.codecs.head, eb, 1)
      val best = BenchData.codecs.drop(1).map { codec =>
        val curve = SweepEbs.map(beb => rdRow(frames, codec.name, codec, beb, 1)).sortBy(_._1)
        codec.name -> psnrAt(curve, lcpBr)
      }.maxBy(_._2)
      Seq(ds, TableFmt.f3(lcpBr), TableFmt.f1(lcpPs), best._1, TableFmt.f1(best._2),
        f"${lcpPs - best._2}%+.1f dB")
    }
    TableFmt.render("Fig 12 summary: PSNR at LCP's bit rate (baselines interpolated on their R-D curves)",
      Seq("Dataset", "Bit rate", "LCP PSNR", "Best baseline", "Baseline PSNR", "LCP advantage"), rows)
  }

  /** Linear interpolation of PSNR at bit rate `br` on a sorted R-D curve;
    * clamps to the end points outside the measured range. */
  private def psnrAt(curve: Seq[(Double, Double)], br: Double): Double = {
    val finite = curve.filter(p => java.lang.Double.isFinite(p._2))
    if (finite.isEmpty) return 0.0
    if (br <= finite.head._1) return finite.head._2
    if (br >= finite.last._1) return finite.last._2
    val i = finite.lastIndexWhere(_._1 <= br)
    val (b0, p0) = finite(i); val (b1, p1) = finite(i + 1)
    if (b1 == b0) p0 else p0 + (p1 - p0) * (br - b0) / (b1 - b0)
  }
}
