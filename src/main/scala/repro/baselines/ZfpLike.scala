package repro.baselines

import java.io.{ByteArrayInputStream, ByteArrayOutputStream}
import repro.coding.{BitReader, BitWriter, ByteIO, Dictionary, Zigzag}
import repro.core.{Frame, Quantizer}

/** ZFP-style baseline: fixed-point block transform coding. Each coordinate
  * array is quantized against the error bound, split into blocks of 4
  * values (ZFP's 1-D block size), and each block is bit-packed at its own
  * width. Single-pass, no entropy model — very fast, but on particle data
  * (no within-block correlation in storage order) block widths stay large,
  * reproducing ZFP's fast-but-poor-ratio position in §8.
  */
object ZfpLike extends FrameWiseCodec {
  override val name = "ZFP"
  private val BlockLen = 4

  override def compressFrame(f: Frame, eb: Double): (Array[Byte], Array[Int]) = {
    val out = new ByteArrayOutputStream(f.n + 64)
    Zigzag.writeVarLong(out, f.n.toLong)
    ByteIO.writeDouble(out, eb)
    val (mx, my, mz) = f.mins
    ByteIO.writeDouble(out, mx); ByteIO.writeDouble(out, my); ByteIO.writeDouble(out, mz)
    val body = new ByteArrayOutputStream(f.n * 3 + 64)
    Seq((f.x, mx), (f.y, my), (f.z, mz)).foreach { case (dim, min) =>
      ByteIO.writeSection(body, encodeDim(Quantizer.quantizeArray(dim, min, eb)))
    }
    ByteIO.writeSection(out, Dictionary.compress(body.toByteArray))
    (out.toByteArray, null)
  }

  /** Per block of 4: a 6-bit width, then 4 values at that width. Within a
    * block we code deltas from the block's first value (a cheap stand-in
    * for ZFP's decorrelating transform on our integer lattice). */
  private def encodeDim(q: Array[Long]): Array[Byte] = {
    val w = new BitWriter(q.length * 4 + 16)
    var i = 0
    while (i < q.length) {
      val end  = math.min(i + BlockLen, q.length)
      val base = q(i)
      var maxZ = 0L
      var j = i
      while (j < end) { val z = Zigzag.encode(q(j) - base); if (z > maxZ) maxZ = z; j += 1 }
      val width = Zigzag.bitWidth(maxZ)
      w.writeBits(width.toLong, 6)
      // Block base value always at full width (64) — keeps blocks independent.
      w.writeBits(base, 64)
      j = i + 1
      while (j < end) { w.writeBits(Zigzag.encode(q(j) - base), width); j += 1 }
      i = end
    }
    w.toBytes
  }

  private def decodeDim(bytes: Array[Byte], n: Int): Array[Long] = {
    val r   = new BitReader(bytes)
    val out = new Array[Long](n)
    var i = 0
    while (i < n) {
      val end   = math.min(i + BlockLen, n)
      val width = r.readBits(6).toInt
      val base  = r.readBits(64)
      out(i) = base
      var j = i + 1
      while (j < end) { out(j) = base + Zigzag.decode(r.readBits(width)); j += 1 }
      i = end
    }
    out
  }

  override def decompressFrame(bytes: Array[Byte]): Frame = {
    val in = new ByteArrayInputStream(bytes)
    val n  = Zigzag.readVarLong(in).toInt
    val eb = ByteIO.readDouble(in)
    val mins = Seq(ByteIO.readDouble(in), ByteIO.readDouble(in), ByteIO.readDouble(in))
    val body = new ByteArrayInputStream(Dictionary.decompress(ByteIO.readSection(in)))
    val dims = mins.map { min =>
      Quantizer.dequantizeArray(decodeDim(ByteIO.readSection(body), n), min, eb)
    }
    Frame(dims(0), dims(1), dims(2))
  }
}
