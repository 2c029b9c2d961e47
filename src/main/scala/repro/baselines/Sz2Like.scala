package repro.baselines

import java.io.{ByteArrayInputStream, ByteArrayOutputStream}
import repro.coding.{ByteIO, Dictionary, IntCoder, Zigzag}
import repro.core.Frame

/** SZ2-style baseline: 1-D Lorenzo prediction (previous reconstructed
  * value) over each coordinate array in storage order, error-bounded
  * residual quantization, Huffman + Zstd.
  *
  * This is the generic mesh-compressor design the paper contrasts with:
  * on particles the storage order carries little spatial correlation, so
  * residuals stay large (§3, §6.1). Order-preserving.
  */
object Sz2Like extends FrameWiseCodec {
  override val name = "SZ2"

  override def compressFrame(f: Frame, eb: Double): (Array[Byte], Array[Int]) = {
    val out = new ByteArrayOutputStream(f.n + 64)
    Zigzag.writeVarLong(out, f.n.toLong)
    ByteIO.writeDouble(out, eb)
    val body = new ByteArrayOutputStream(f.n + 64)
    Seq(f.x, f.y, f.z).foreach { dim =>
      ByteIO.writeSection(body, IntCoder.encode(lorenzo(dim, eb), delta = false))
    }
    ByteIO.writeSection(out, Dictionary.compress(body.toByteArray))
    (out.toByteArray, null)
  }

  private def lorenzo(v: Array[Double], eb: Double): Array[Long] = {
    val q = new Array[Long](v.length)
    var pred = 0.0
    var i = 0
    while (i < v.length) {
      q(i) = PredCoding.quantResidual(v(i), pred, eb)
      pred = PredCoding.recon(pred, q(i), eb)
      i += 1
    }
    q
  }

  override def decompressFrame(bytes: Array[Byte]): Frame = {
    val in = new ByteArrayInputStream(bytes)
    val n  = Zigzag.readVarLong(in).toInt
    val eb = ByteIO.readDouble(in)
    val body = new ByteArrayInputStream(Dictionary.decompress(ByteIO.readSection(in)))
    val dims = (0 until 3).map { _ =>
      val q   = IntCoder.decode(new ByteArrayInputStream(ByteIO.readSection(body)))
      require(q.length == n, "length mismatch")
      val out = new Array[Double](n)
      var pred = 0.0
      var i = 0
      while (i < n) { pred = PredCoding.recon(pred, q(i), eb); out(i) = pred; i += 1 }
      out
    }
    Frame(dims(0), dims(1), dims(2))
  }
}
