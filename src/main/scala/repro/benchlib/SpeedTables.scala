package repro.benchlib

import repro.core.Frame
import repro.metrics.Metrics

/** Figures 16–18: compression and decompression throughput tables.
  *
  * §8.2.6 defines data retrieval as I/O + decompression: the compressed
  * bytes must be read from storage before decoding, so the smallest format
  * wins I/O time. The retrieval column models a [[DiskMBs]] MB/s store;
  * pure decompression throughput is also reported (the paper's Figs 17/18
  * measure a node-local setup where LCP's decoder is also fastest — on the
  * JVM our decoders share one entropy stack, so the size advantage is the
  * dominant reproduced effect; see EXPERIMENTS.md).
  */
object SpeedTables {

  /** Simulated storage bandwidths for the retrieval metric (MB/s): a fast
    * node-local store, and a congested-PFS / inter-facility link (§1: cross-
    * facility transfers "may take hours or days"), where the compressed
    * size dominates end-to-end retrieval. */
  val DiskMBs    = 200.0
  val SlowLinkMBs = 25.0

  /** The four datasets the paper quotes single-frame retrieval speedups on
    * (§8.2.6: HACC +202%, Helium +593%, BUN-ZIPPER +397%, 3DEP +257%). */
  val SingleSpeedSets: Seq[String] = Seq("HACC", "Helium", "BUN-ZIPPER", "3DEP")

  final case class Speed(dataset: String, codec: String, compBytes: Long,
                         compMBs: Double, decompMBs: Double) {
    /** End-to-end retrieval throughput: read compressed bytes at `diskMBs`,
      * then decompress. */
    def retrievalMBs(origBytes: Long, diskMBs: Double = DiskMBs): Double = {
      val ioSec     = compBytes / 1e6 / diskMBs
      val decompSec = origBytes / 1e6 / decompMBs
      origBytes / 1e6 / (ioSec + decompSec)
    }
  }

  final case class SpeedSet(origBytes: Long, speeds: Seq[Speed])

  private def measure(name: String, frames: IndexedSeq[Frame],
                      codec: repro.baselines.ParticleCodec, eb: Double, batch: Int): Speed = {
    val orig = Metrics.originalSizeBytes(frames)
    // One untimed run first (JIT warmup), then best-of-N timing: transient
    // GC or host stalls inflate individual reps, and the minimum is the
    // standard robust estimator for throughput benches.
    val warm = codec.compress(frames, eb, batch)
    codec.decompress(warm.payload)
    val compRuns = (1 to 2).map(_ => Metrics.time(codec.compress(frames, eb, batch)))
    val ct = compRuns.map(_._2).min
    val c  = compRuns.last._1
    val dt = (1 to 3).map(_ => Metrics.time(codec.decompress(c.payload))._2).min
    Speed(name, codec.name, c.payload.length.toLong,
      Metrics.mbPerSec(orig, ct), Metrics.mbPerSec(orig, dt))
  }

  /** Figs. 16 + 17: single-frame compression and decompression speed. */
  def singleFrame(eb: Double = 1e-2): Seq[SpeedSet] =
    SingleSpeedSets.map { ds =>
      val f = BenchData.singleFrame.find(_._1 == ds).get._2
      SpeedSet(Metrics.originalSizeBytes(Seq(f)),
        BenchData.codecs.map(codec => measure(ds, IndexedSeq(f), codec, eb, 1)))
    }

  /** Fig. 18: batch-mode (16-frame) retrieval speed on multi-frame sets. */
  def batchMode(eb: Double = 1e-2): Seq[SpeedSet] =
    BenchData.multiFrame.map { case (ds, frames) =>
      SpeedSet(Metrics.originalSizeBytes(frames),
        BenchData.codecs.map(codec => measure(ds, frames, codec, eb, 16)))
    }

  def table(title: String, sets: Seq[SpeedSet]): String = {
    val rows = for (set <- sets; s <- set.speeds) yield Seq(
      s.dataset, s.codec, TableFmt.f1(s.compMBs), TableFmt.f1(s.decompMBs),
      TableFmt.f1(s.retrievalMBs(set.origBytes)),
      TableFmt.f1(s.retrievalMBs(set.origBytes, SlowLinkMBs)))
    TableFmt.render(title,
      Seq("Dataset", "Compressor", "Compress MB/s", "Decompress MB/s",
        s"Retrieval @ ${DiskMBs.toInt} MB/s", s"Retrieval @ ${SlowLinkMBs.toInt} MB/s"), rows)
  }

  /** §8.2.6 summary: LCP retrieval speed vs the best baseline over the
    * slow link, where the paper's size-dominates-I/O argument applies. */
  def decompressionAdvantage(sets: Seq[SpeedSet], title: String): String = {
    val rows = sets.map { set =>
      val ds     = set.speeds.head.dataset
      val lcp    = set.speeds.find(_.codec == "LCP").get.retrievalMBs(set.origBytes, SlowLinkMBs)
      val (bn, bv) = set.speeds.filter(_.codec != "LCP")
        .map(s => s.codec -> s.retrievalMBs(set.origBytes, SlowLinkMBs)).maxBy(_._2)
      Seq(ds, TableFmt.f1(lcp), s"$bn (${TableFmt.f1(bv)})", f"${(lcp / bv - 1) * 100}%+.0f%%")
    }
    TableFmt.render(title,
      Seq("Dataset", s"LCP retrieval MB/s @ ${SlowLinkMBs.toInt}", "Best baseline", "LCP advantage"), rows)
  }
}
