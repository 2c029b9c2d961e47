package repro.benchlib

import repro.baselines.LcpCodec
import repro.metrics.Metrics

/** Figure 8 (ablation) and Figure 9 (error distribution) as tables. */
object AblationTables {

  /** The four ablation lines of Fig. 8, in paper order. */
  def variants: Seq[(String, LcpCodec)] = Seq(
    "LCP-S"           -> LcpCodec.lcpSOnly(64),
    "LCP-S+BLK"       -> LcpCodec.lcpSBlk,
    "LCP-S+BLK+T"     -> LcpCodec.lcpNoEbScale,
    "LCP-S+BLK+T+EB"  -> LcpCodec.full)

  /** Bit rate of each ablation stage on every multi-frame dataset. */
  def ablation(batchSize: Int = 16): String = {
    val combos = for {
      (ds, frames) <- BenchData.multiFrame
      eb <- BenchData.PaperEbs
    } yield (ds, frames, eb)
    val rows = Par.map(combos) { case (ds, frames, eb) =>
      val rates = variants.map { case (_, codec) =>
        val c = codec.compress(frames, eb, batchSize)
        Metrics.bitRate(frames, c.payload.length.toLong)
      }
      Seq(ds, TableFmt.sci(eb)) ++ rates.map(TableFmt.f3)
    }
    TableFmt.render(s"Fig 8 (ablation): bit rate per LCP stage (batch=$batchSize; lower is better)",
      Seq("Dataset", "eb") ++ variants.map(_._1), rows)
  }

  /** Fig. 9: error distribution of LCP on Helium at eb = 0.1. */
  def errorDistribution(eb: Double = 0.1): String = {
    val frames = BenchData.multiFrame.find(_._1 == "Helium").get._2
    val codec  = LcpCodec.full
    val c      = codec.compress(frames, eb, 16)
    val dec    = codec.decompress(c.payload)
    val buckets = new Array[Long](10)
    var maxErr  = 0.0
    frames.indices.foreach { t =>
      val o = frames(t); val d = dec(t); val perm = c.perms(t)
      var i = 0
      while (i < d.n) {
        val j = if (perm == null) i else perm(i)
        Seq(o.x(j) - d.x(i), o.y(j) - d.y(i), o.z(j) - d.z(i)).foreach { e =>
          val a = math.abs(e)
          maxErr = math.max(maxErr, a)
          buckets(math.min(9, (a / eb * 10).toInt)) += 1
        }
        i += 1
      }
    }
    val total = buckets.sum.toDouble
    val rows = buckets.zipWithIndex.map { case (cnt, k) =>
      Seq(f"[${k / 10.0}%.1f, ${(k + 1) / 10.0}%.1f)·eb", cnt.toString, f"${cnt / total * 100}%.2f%%")
    }
    TableFmt.render(f"Fig 9: LCP error distribution on Helium (eb=$eb; max |err| = $maxErr%.6f <= eb)",
      Seq("Error bucket", "Count", "Share"), rows.toSeq)
  }
}
