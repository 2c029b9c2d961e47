package repro.baselines

import repro.core.{Frame, Lcp}
import repro.core.Lcp.LcpConfig

/** LCP exposed through the common bench interface. The constructor knobs
  * back the §8.2.1 ablation lines: `LcpCodec()` is the full system,
  * `lcpSOnly` / `lcpSBlk` / `lcpNoEbScale` switch features off.
  */
final class LcpCodec(override val name: String = "LCP",
                     blockSizeP: Option[Int] = None,
                     ebScaleMode: Lcp.EbScaleMode = Lcp.Auto,
                     disableTemporal: Boolean = false) extends ParticleCodec {

  def config(eb: Double, batchSize: Int): LcpConfig =
    LcpConfig(eb, batchSize, blockSizeP, ebScaleMode, disableTemporal)

  override def compress(frames: IndexedSeq[Frame], eb: Double, batchSize: Int): Compressed = {
    val r = Lcp.compress(frames, config(eb, batchSize))
    Compressed(r.archive.toBytes, r.perms)
  }

  override def decompress(payload: Array[Byte]): IndexedSeq[Frame] =
    Lcp.decompressAll(Lcp.LcpArchive.fromBytes(payload))
}

object LcpCodec {
  /** The full system (all §7 features on). */
  def full: LcpCodec = new LcpCodec()

  /** Ablation line 1: spatial only, fixed block size (no BLK, no T, no EB). */
  def lcpSOnly(p: Int = 64): LcpCodec =
    new LcpCodec("LCP-S", Some(p), Lcp.Off, disableTemporal = true)

  /** Ablation line 2: + dynamic block size. */
  def lcpSBlk: LcpCodec = new LcpCodec("LCP-S+BLK", None, Lcp.Off, disableTemporal = true)

  /** Ablation line 3: + temporal hybrid (no anchor eb scaling). */
  def lcpNoEbScale: LcpCodec = new LcpCodec("LCP-S+BLK+T", None, Lcp.Off)
}
