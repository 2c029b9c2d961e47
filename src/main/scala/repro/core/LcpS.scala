package repro.core

import java.io.{ByteArrayInputStream, ByteArrayOutputStream}
import repro.coding.{ByteIO, Dictionary, IntCoder, Zigzag}
import repro.core.Quantizer.QFrame

/** LCP-S — the error-bound-aware block-wise spatial compressor (§6).
  *
  * Pipeline: Eq. 5 quantization → Eq. 6 spatial blocking → per-array coding
  * chain (delta → {Huffman | fixed-length} → Zstd) over the three stored
  * arrays: block ids, per-block particle counts, and relative positions.
  *
  * The frame is reconstructed as the same multiset of points in block order;
  * [[SResult.perm]] carries the input→stored correspondence for the codec's
  * own temporal chaining (DESIGN.md §2, particle-order semantics).
  */
object LcpS {

  /** Compression output: the stored bytes plus codec-internal state used by
    * the multi-frame compressor (never serialized).
    *
    * @param bytes compressed frame (self-contained)
    * @param perm  perm(i) = original index of the particle stored at slot i
    * @param recon reconstruction of the frame in stored (block) order
    */
  final case class SResult(bytes: Array[Byte], perm: Array[Int], recon: Frame)

  /** Compress `f` at absolute error bound `eb` with block parameter `p`. */
  def compress(f: Frame, eb: Double, p: Int): SResult = {
    val qf      = Quantizer.quantizeFrame(f, eb)
    val grouped = BlockIndex.group(qf, p)

    val header = new ByteArrayOutputStream(64)
    Zigzag.writeVarLong(header, f.n.toLong)
    ByteIO.writeDouble(header, eb)
    Zigzag.writeVarLong(header, p.toLong)
    ByteIO.writeDouble(header, qf.minX); ByteIO.writeDouble(header, qf.minY); ByteIO.writeDouble(header, qf.minZ)
    Zigzag.writeVarLong(header, grouped.bnx)
    Zigzag.writeVarLong(header, grouped.bny)

    // §6.2.2 coding chain; the five sections are concatenated and the
    // dictionary coder (Zstd) runs once over the whole payload.
    val body = new ByteArrayOutputStream(f.n * 2 + 64)
    ByteIO.writeSection(body, IntCoder.encode(grouped.blockIds))
    ByteIO.writeSection(body, IntCoder.encode(grouped.counts))
    ByteIO.writeSection(body, IntCoder.encode(grouped.relX))
    ByteIO.writeSection(body, IntCoder.encode(grouped.relY))
    ByteIO.writeSection(body, IntCoder.encode(grouped.relZ))

    val out = new ByteArrayOutputStream(f.n + 96)
    out.write(header.toByteArray)
    ByteIO.writeSection(out, Dictionary.compress(body.toByteArray))

    // Reconstruction in stored order = dequantized bins in block order.
    val reconQ = reorderQ(qf, grouped.perm)
    SResult(out.toByteArray, grouped.perm, reconQ.dequantize)
  }

  private def reorderQ(qf: QFrame, perm: Array[Int]): QFrame = {
    val n  = qf.n
    val qx = new Array[Long](n); val qy = new Array[Long](n); val qz = new Array[Long](n)
    var i = 0
    while (i < n) { val j = perm(i); qx(i) = qf.qx(j); qy(i) = qf.qy(j); qz(i) = qf.qz(j); i += 1 }
    QFrame(qx, qy, qz, qf.minX, qf.minY, qf.minZ, qf.eb)
  }

  /** Decompress a frame written by [[compress]] (returned in block order). */
  def decompress(bytes: Array[Byte]): Frame = {
    val in  = new ByteArrayInputStream(bytes)
    val n   = Zigzag.readVarLong(in).toInt
    val eb  = ByteIO.readDouble(in)
    val p   = Zigzag.readVarLong(in).toInt
    val mx  = ByteIO.readDouble(in); val my = ByteIO.readDouble(in); val mz = ByteIO.readDouble(in)
    val bnx = Zigzag.readVarLong(in)
    val bny = Zigzag.readVarLong(in)
    val body = new ByteArrayInputStream(Dictionary.decompress(ByteIO.readSection(in)))
    val blockIds = IntCoder.decode(new ByteArrayInputStream(ByteIO.readSection(body)))
    val counts   = IntCoder.decode(new ByteArrayInputStream(ByteIO.readSection(body)))
    val relX     = IntCoder.decode(new ByteArrayInputStream(ByteIO.readSection(body)))
    val relY     = IntCoder.decode(new ByteArrayInputStream(ByteIO.readSection(body)))
    val relZ     = IntCoder.decode(new ByteArrayInputStream(ByteIO.readSection(body)))
    require(relX.length == n, s"decoded ${relX.length} particles, expected $n")
    val (qx, qy, qz) = BlockIndex.ungroup(blockIds, counts, relX, relY, relZ, p, bnx, bny)
    QFrame(qx, qy, qz, mx, my, mz, eb).dequantize
  }

  /** Per-section encoded sizes (block ids, counts, rel pos) under both
    * §6.2.2 coding choices — the Table 3 / Figure 5 measurement hook.
    * Sizes are pre-Zstd, as in the paper's table.
    */
  final case class SectionCosts(blockIdFixed: Long, blockIdHuffman: Option[Long],
                                countFixed: Long, countHuffman: Option[Long],
                                relPosFixed: Long, relPosHuffman: Option[Long])

  def sectionCosts(f: Frame, eb: Double, p: Int): SectionCosts = {
    val grouped = BlockIndex.group(Quantizer.quantizeFrame(f, eb), p)
    val (bf, bh) = IntCoder.methodCosts(grouped.blockIds, delta = true)
    val (cf, ch) = IntCoder.methodCosts(grouped.counts, delta = true)
    val rels = Seq(grouped.relX, grouped.relY, grouped.relZ).map(IntCoder.methodCosts(_, delta = true))
    val rf = rels.map(_._1).sum
    val rh = if (rels.forall(_._2.isDefined)) Some(rels.flatMap(_._2).sum) else None
    SectionCosts(bf, bh, cf, ch, rf, rh)
  }
}
