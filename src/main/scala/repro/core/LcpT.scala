package repro.core

import java.io.{ByteArrayInputStream, ByteArrayOutputStream}
import repro.coding.{ByteIO, Dictionary, IntCoder, Zigzag}

/** LCP-T — the temporal compressor (§7.1).
  *
  * Each coordinate of the current frame is predicted by the previous
  * *reconstructed* frame at the same index and the residual is quantized
  * with the error-bound-aware scheme of §6.1, centred on the prediction
  * (see [[Quantizer.quantizeResidual]]); the integer difference array is
  * then coded with Huffman + Zstd. Compressor and decompressor derive the
  * identical reconstruction `prev + 2·eb·q`, so chaining is exact and the
  * per-frame bound |d − d'| ≤ eb holds regardless of chain length.
  *
  * The caller must supply the current frame already aligned to the previous
  * frame's stored particle order (per-index correspondence; DESIGN.md §2).
  */
object LcpT {

  /** @param bytes compressed frame; @param recon reconstruction in the same
    * (inherited) stored order — the next frame's prediction basis. */
  final case class TResult(bytes: Array[Byte], recon: Frame)

  /** Compress `aligned` at bound `eb`, predicting from `prevRecon`. */
  def compress(aligned: Frame, prevRecon: Frame, eb: Double): TResult = {
    require(aligned.n == prevRecon.n,
      s"temporal compression requires equal particle counts: ${aligned.n} vs ${prevRecon.n}")
    require(eb > 0, s"error bound must be positive: $eb")
    val out = new ByteArrayOutputStream(aligned.n + 64)
    Zigzag.writeVarLong(out, aligned.n.toLong)
    ByteIO.writeDouble(out, eb)
    val body  = new ByteArrayOutputStream(aligned.n + 64)
    val recon = Seq((aligned.x, prevRecon.x), (aligned.y, prevRecon.y), (aligned.z, prevRecon.z))
      .map { case (cur, prev) =>
        val q = new Array[Long](cur.length)
        val r = new Array[Double](cur.length)
        var i = 0
        while (i < cur.length) {
          q(i) = Quantizer.quantizeResidual(cur(i), prev(i), eb)
          r(i) = Quantizer.reconResidual(prev(i), q(i), eb)
          i += 1
        }
        // Diffs are already small and centred on zero; the delta stage stays
        // off and the Huffman-vs-fixed pick runs on the raw residual array.
        ByteIO.writeSection(body, IntCoder.encode(q, delta = false))
        r
      }
    ByteIO.writeSection(out, Dictionary.compress(body.toByteArray))
    TResult(out.toByteArray, Frame(recon(0), recon(1), recon(2)))
  }

  /** Decompress a frame written by [[compress]] given the same `prevRecon`. */
  def decompress(bytes: Array[Byte], prevRecon: Frame): Frame = {
    val in = new ByteArrayInputStream(bytes)
    val n  = Zigzag.readVarLong(in).toInt
    require(n == prevRecon.n, s"frame length $n does not match previous frame ${prevRecon.n}")
    val eb   = ByteIO.readDouble(in)
    val body = new ByteArrayInputStream(Dictionary.decompress(ByteIO.readSection(in)))
    val dims = Seq(prevRecon.x, prevRecon.y, prevRecon.z).map { prev =>
      val q = IntCoder.decode(new ByteArrayInputStream(ByteIO.readSection(body)))
      require(q.length == n, "decoded length mismatch")
      val r = new Array[Double](n)
      var i = 0
      while (i < n) { r(i) = Quantizer.reconResidual(prev(i), q(i), eb); i += 1 }
      r
    }
    Frame(dims(0), dims(1), dims(2))
  }
}
