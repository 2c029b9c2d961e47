package repro.core

import java.io.{ByteArrayInputStream, ByteArrayOutputStream}
import repro.coding.{ByteIO, Zigzag}

/** LCP — the dynamic multi-frame hybrid compressor (§7, Algorithm 1).
  *
  * Frames are compressed in independent batches of `batchSize` frames for
  * partial retrieval (§2.1.3). Within a batch, each frame is compressed by
  * LCP-S or LCP-T, chosen per frame by LCP-FSM; a first-in-batch frame may
  * be temporally compressed against the nearest earlier *spatial anchor
  * frame*, which is stored in a separate anchor array, so no inter-batch
  * dependency is introduced (§7.3).
  */
object Lcp {

  /** How the §7.4.2 anchor error-bound scaling is applied. */
  sealed trait EbScaleMode
  /** Gate on the temporal-correlation probe; use factor 5 when it passes. */
  case object Auto extends EbScaleMode
  /** Never scale. */
  case object Off extends EbScaleMode
  /** Always scale by the given factor (bench support for Fig. 7). */
  final case class Forced(factor: Double) extends EbScaleMode

  /** Compression parameters. `blockSizeP = None` triggers the §7.4.1
    * dynamic block-size optimization on the first frame. */
  final case class LcpConfig(eb: Double,
                             batchSize: Int = 16,
                             blockSizeP: Option[Int] = None,
                             ebScaleMode: EbScaleMode = Auto,
                             disableTemporal: Boolean = false) {
    require(eb > 0, "error bound must be positive")
    require(batchSize >= 1, "batch size must be >= 1")
  }

  /** Per-frame metadata. `slot` indexes the anchor array when `inAnchor`,
    * otherwise the payload list of the frame's batch. `anchorRef` is the
    * anchor a first-in-batch temporal frame depends on (-1 otherwise). */
  final case class FrameEntry(temporal: Boolean, inAnchor: Boolean, slot: Int, anchorRef: Int)

  /** The compressed multi-frame container (§7.3's two output arrays plus
    * metadata). Self-contained: [[toBytes]]/[[fromBytes]] round-trip it. */
  final case class LcpArchive(eb: Double, anchorEbScale: Double, batchSize: Int, p: Int,
                              entries: IndexedSeq[FrameEntry],
                              anchors: IndexedSeq[Array[Byte]],
                              batches: IndexedSeq[IndexedSeq[Array[Byte]]]) {
    def numFrames: Int = entries.size

    /** Total compressed size including every piece of metadata (the paper
      * counts all metadata — §8.1.3, MDZ note). */
    def compressedSizeBytes: Long = toBytes.length.toLong

    def toBytes: Array[Byte] = {
      val out = new ByteArrayOutputStream(1024)
      out.write('L'); out.write('C'); out.write('P'); out.write('1')
      ByteIO.writeDouble(out, eb)
      ByteIO.writeDouble(out, anchorEbScale)
      Zigzag.writeVarLong(out, batchSize.toLong)
      Zigzag.writeVarLong(out, p.toLong)
      Zigzag.writeVarLong(out, entries.size.toLong)
      entries.foreach { e =>
        out.write((if (e.temporal) 1 else 0) | (if (e.inAnchor) 2 else 0))
        Zigzag.writeVarLong(out, e.slot.toLong)
        Zigzag.writeVarLong(out, Zigzag.encode(e.anchorRef.toLong))
      }
      Zigzag.writeVarLong(out, anchors.size.toLong)
      anchors.foreach(ByteIO.writeSection(out, _))
      Zigzag.writeVarLong(out, batches.size.toLong)
      batches.foreach { b =>
        Zigzag.writeVarLong(out, b.size.toLong)
        b.foreach(ByteIO.writeSection(out, _))
      }
      out.toByteArray
    }
  }

  object LcpArchive {
    def fromBytes(bytes: Array[Byte]): LcpArchive = {
      val in = new ByteArrayInputStream(bytes)
      require(in.read() == 'L' && in.read() == 'C' && in.read() == 'P' && in.read() == '1',
        "not an LCP archive")
      val eb        = ByteIO.readDouble(in)
      val scale     = ByteIO.readDouble(in)
      val batchSize = Zigzag.readVarLong(in).toInt
      val p         = Zigzag.readVarLong(in).toInt
      val nf        = Zigzag.readVarLong(in).toInt
      val entries = IndexedSeq.fill(nf) {
        val flags = in.read()
        val slot  = Zigzag.readVarLong(in).toInt
        val ref   = Zigzag.decode(Zigzag.readVarLong(in)).toInt
        FrameEntry((flags & 1) != 0, (flags & 2) != 0, slot, ref)
      }
      val na      = Zigzag.readVarLong(in).toInt
      val anchors = IndexedSeq.fill(na)(ByteIO.readSection(in))
      val nb      = Zigzag.readVarLong(in).toInt
      val batches = IndexedSeq.fill(nb) {
        val c = Zigzag.readVarLong(in).toInt
        IndexedSeq.fill(c)(ByteIO.readSection(in))
      }
      LcpArchive(eb, scale, batchSize, p, entries, anchors, batches)
    }
  }

  /** Compression output. `perms(i)(s)` = original index of the particle at
    * stored slot s of frame i (codec-internal correspondence, used by tests
    * to verify the error bound per particle). `methods` and `tTrials`
    * expose the FSM's behaviour for the ablation/overhead benches. */
  final case class Result(archive: LcpArchive,
                          perms: IndexedSeq[Array[Int]],
                          methods: IndexedSeq[Char],
                          tTrials: Int)

  /** §7.4.2 micro-trial: compress a particle-sampled prefix of 3 batches
    * with and without the anchor scale factor and compare total sizes. */
  private def scalingPays(frames: IndexedSeq[Frame], cfg: LcpConfig, p: Int): Boolean = {
    val prefix = frames.take(3 * cfg.batchSize)
    val n      = prefix.head.n
    if (n == 0 || prefix.exists(_.n != n)) return false
    val sampled =
      if (n <= 4096) prefix
      else {
        val stride = n.toDouble / 4096
        val idx    = Array.tabulate(4096)(i => (i * stride).toInt)
        prefix.map(_.reorder(idx))
      }
    val base   = compress(sampled, cfg.copy(ebScaleMode = Off, blockSizeP = Some(p)))
    val scaled = compress(sampled, cfg.copy(ebScaleMode = Forced(EbScale.Factor), blockSizeP = Some(p)))
    scaled.archive.compressedSizeBytes < base.archive.compressedSizeBytes
  }

  /** Algorithm 1 with LCP-FSM selection and both §7.4 optimizations. */
  def compress(frames: IndexedSeq[Frame], cfg: LcpConfig): Result = {
    require(frames.nonEmpty, "no frames to compress")
    val p = cfg.blockSizeP.getOrElse(BlockSizeOpt.bestBlockSize(frames.head, cfg.eb)._1)
    // Auto scaling (§7.4.2: "dynamically analyze input data and apply this
    // error-bound scaling method selectively"): candidate only when frames
    // are temporally correlated and anchors are shared by several batch
    // heads; then a sampled micro-trial compresses a prefix both ways and
    // keeps the scaling only if it actually pays — whether tighter anchors
    // win depends on how much of the budget temporal frames consume, which
    // is cheap to measure and hard to predict.
    val scale = cfg.ebScaleMode match {
      case Off       => 1.0
      case Forced(f) => f
      case Auto      =>
        val batches = (frames.size + cfg.batchSize - 1) / cfg.batchSize
        if (batches >= 3 && EbScale.highTemporalCorrelation(frames, cfg.eb) &&
            scalingPays(frames, cfg, p)) EbScale.Factor
        else 1.0
    }

    val fsm     = new LcpFsm
    val anchors = IndexedSeq.newBuilder[Array[Byte]]
    var numAnchors = 0
    val batches = IndexedSeq.newBuilder[IndexedSeq[Array[Byte]]]
    var batch   = IndexedSeq.newBuilder[Array[Byte]]
    var batchLen = 0
    val entries = IndexedSeq.newBuilder[FrameEntry]
    val perms   = IndexedSeq.newBuilder[Array[Int]]
    val methods = IndexedSeq.newBuilder[Char]

    // Codec state: previous frame's reconstruction + permutation, the last
    // anchor's ditto, the last actual LCP-S size (the FSM's S estimate).
    var prevRecon: Frame       = null
    var prevPerm: Array[Int]   = null
    var anchorRecon: Frame     = null
    var anchorPerm: Array[Int] = null
    var anchorIdx              = -1
    var lastSSize              = -1L
    var tTrials                = 0

    for ((f, i) <- frames.zipWithIndex) {
      val firstInBatch = i % cfg.batchSize == 0
      val basisRecon   = if (firstInBatch) anchorRecon else prevRecon
      val basisPerm    = if (firstInBatch) anchorPerm else prevPerm
      val canTemporal =
        !cfg.disableTemporal && basisRecon != null && basisRecon.n == f.n && f.n > 0

      // Anchor frames (first-in-batch spatial) may use the scaled bound.
      val sEb = if (firstInBatch) cfg.eb / scale else cfg.eb

      var spatial: LcpS.SResult = null
      var temporalBytes: Array[Byte] = null
      var temporalRecon: Frame = null

      if (!canTemporal) {
        spatial = LcpS.compress(f, sEb, p)
        fsm.observe(compared = false, spatialWon = true)
      } else fsm.nextAction() match {
        case LcpFsm.UseSpatial =>
          spatial = LcpS.compress(f, sEb, p)
          fsm.observe(compared = false, spatialWon = true)
        case LcpFsm.Compare =>
          val aligned = f.reorder(basisPerm)
          val t = LcpT.compress(aligned, basisRecon, cfg.eb)
          tTrials += 1
          // LCP-S size is estimated from the last actual LCP-S frame (§7.2);
          // before any LCP-S run exists, measure it once.
          val sEst = if (lastSSize >= 0) lastSSize else { spatial = LcpS.compress(f, sEb, p); spatial.bytes.length.toLong }
          val spatialWon = sEst <= t.bytes.length
          if (spatialWon) { if (spatial == null) spatial = LcpS.compress(f, sEb, p) }
          else { spatial = null; temporalBytes = t.bytes; temporalRecon = t.recon }
          fsm.observe(compared = true, spatialWon = spatialWon)
      }

      if (spatial != null) {
        lastSSize = spatial.bytes.length.toLong
        if (firstInBatch) {
          anchors += spatial.bytes
          anchorRecon = spatial.recon; anchorPerm = spatial.perm; anchorIdx = numAnchors
          entries += FrameEntry(temporal = false, inAnchor = true, slot = numAnchors, anchorRef = -1)
          numAnchors += 1
        } else {
          entries += FrameEntry(temporal = false, inAnchor = false, slot = batchLen, anchorRef = -1)
          batch += spatial.bytes; batchLen += 1
        }
        prevRecon = spatial.recon; prevPerm = spatial.perm
        perms += spatial.perm
        methods += 'S'
      } else {
        entries += FrameEntry(temporal = true, inAnchor = false, slot = batchLen,
          anchorRef = if (firstInBatch) anchorIdx else -1)
        batch += temporalBytes; batchLen += 1
        prevRecon = temporalRecon; prevPerm = basisPerm
        perms += basisPerm
        methods += 'T'
      }

      if ((i + 1) % cfg.batchSize == 0 || i == frames.size - 1) {
        batches += batch.result()
        batch = IndexedSeq.newBuilder[Array[Byte]]
        batchLen = 0
      }
    }

    val archive = LcpArchive(cfg.eb, scale, cfg.batchSize, p,
      entries.result(), anchors.result(), batches.result())
    Result(archive, perms.result(), methods.result(), tTrials)
  }

  /** Decompress every frame of one batch — the paper's retrieval unit
    * (§2.1.3). Only the batch's payloads plus (at most) one anchor frame
    * are touched. */
  def decompressBatch(a: LcpArchive, batchIdx: Int): IndexedSeq[Frame] = {
    val start = batchIdx * a.batchSize
    val end   = math.min(start + a.batchSize, a.numFrames)
    var prev: Frame = null
    (start until end).map { i =>
      val e = a.entries(i)
      val f =
        if (!e.temporal) {
          if (e.inAnchor) LcpS.decompress(a.anchors(e.slot))
          else LcpS.decompress(a.batches(batchIdx)(e.slot))
        } else {
          val basis =
            if (i == start) LcpS.decompress(a.anchors(e.anchorRef)) // nearest anchor (§7.3)
            else prev
          LcpT.decompress(a.batches(batchIdx)(e.slot), basis)
        }
      prev = f
      f
    }
  }

  /** Decompress a single frame: decode only its batch up to the frame (plus
    * one anchor when needed) — the §7.3 worst case. */
  def decompressFrame(a: LcpArchive, frameIdx: Int): Frame = {
    val batchIdx = frameIdx / a.batchSize
    val start    = batchIdx * a.batchSize
    // A temporal chain starts at the nearest spatial frame at or before the
    // target (or at the batch head, whose basis is an anchor frame) — only
    // that suffix of the batch needs decoding.
    var chainStart = frameIdx
    while (chainStart > start && a.entries(chainStart).temporal) chainStart -= 1
    var prev: Frame = null
    var out: Frame  = null
    var i = chainStart
    while (i <= frameIdx) {
      val e = a.entries(i)
      val f =
        if (!e.temporal) {
          if (e.inAnchor) LcpS.decompress(a.anchors(e.slot))
          else LcpS.decompress(a.batches(batchIdx)(e.slot))
        } else {
          val basis = if (i == start) LcpS.decompress(a.anchors(e.anchorRef)) else prev
          LcpT.decompress(a.batches(batchIdx)(e.slot), basis)
        }
      prev = f
      out = f
      i += 1
    }
    out
  }

  /** Decompress the whole archive, batch by batch. */
  def decompressAll(a: LcpArchive): IndexedSeq[Frame] =
    a.batches.indices.flatMap(decompressBatch(a, _))
}
