package repro.baselines

import java.io.{ByteArrayInputStream, ByteArrayOutputStream}
import repro.coding.{ByteIO, Dictionary, IntCoder, Zigzag}
import repro.core.Frame

/** SPERR-style baseline: multi-level orthonormal Haar wavelet transform on
  * each coordinate array, uniform coefficient quantization, then — like
  * SPERR — a *correction pass*: the compressor reconstructs its own output,
  * finds samples whose error exceeds the bound, and stores sparse outlier
  * corrections. The transform + double reconstruction make it the slowest
  * codec here, matching its position in Figs. 16–18. Order-preserving.
  */
object SperrLike extends FrameWiseCodec {
  override val name = "SPERR"

  override def compressFrame(f: Frame, eb: Double): (Array[Byte], Array[Int]) = {
    val out = new ByteArrayOutputStream(f.n + 64)
    Zigzag.writeVarLong(out, f.n.toLong)
    ByteIO.writeDouble(out, eb)
    val body = new ByteArrayOutputStream(f.n + 64)
    Seq(f.x, f.y, f.z).foreach(dim => encodeDim(body, dim, eb))
    ByteIO.writeSection(out, Dictionary.compress(body.toByteArray))
    (out.toByteArray, null)
  }

  private def encodeDim(body: ByteArrayOutputStream, v: Array[Double], eb: Double): Unit = {
    val n = v.length
    val coeffs = v.clone()
    forwardHaar(coeffs)
    // Uniform quantization of coefficients at step eb (conservative; the
    // correction pass repairs what leaks past the bound).
    val q = new Array[Long](n)
    var i = 0
    while (i < n) { q(i) = Math.round(coeffs(i) / eb); i += 1 }
    // Reconstruct in-compressor to locate bound violations.
    val rec = new Array[Double](n)
    i = 0
    while (i < n) { rec(i) = q(i) * eb; i += 1 }
    inverseHaar(rec)
    val corrIdx = scala.collection.mutable.ArrayBuffer.empty[Long]
    val corrQ   = scala.collection.mutable.ArrayBuffer.empty[Long]
    i = 0
    while (i < n) {
      if (math.abs(v(i) - rec(i)) > eb) {
        val qc = PredCoding.quantResidual(v(i), rec(i), eb)
        corrIdx += i.toLong
        corrQ += qc
      }
      i += 1
    }
    ByteIO.writeSection(body, IntCoder.encode(q, delta = false))
    ByteIO.writeSection(body, IntCoder.encode(corrIdx.toArray, delta = true))
    ByteIO.writeSection(body, IntCoder.encode(corrQ.toArray, delta = false))
  }

  override def decompressFrame(bytes: Array[Byte]): Frame = {
    val in = new ByteArrayInputStream(bytes)
    val n  = Zigzag.readVarLong(in).toInt
    val eb = ByteIO.readDouble(in)
    val body = new ByteArrayInputStream(Dictionary.decompress(ByteIO.readSection(in)))
    val dims = (0 until 3).map { _ =>
      val q       = IntCoder.decode(new ByteArrayInputStream(ByteIO.readSection(body)))
      val corrIdx = IntCoder.decode(new ByteArrayInputStream(ByteIO.readSection(body)))
      val corrQ   = IntCoder.decode(new ByteArrayInputStream(ByteIO.readSection(body)))
      val rec = new Array[Double](n)
      var i = 0
      while (i < n) { rec(i) = q(i) * eb; i += 1 }
      inverseHaar(rec)
      i = 0
      while (i < corrIdx.length) {
        val j = corrIdx(i).toInt
        rec(j) = PredCoding.recon(rec(j), corrQ(i), eb)
        i += 1
      }
      rec
    }
    Frame(dims(0), dims(1), dims(2))
  }

  private val Sqrt2 = math.sqrt(2.0)

  /** In-place multi-level orthonormal Haar; odd tails pass through. */
  private[baselines] def forwardHaar(a: Array[Double]): Unit = {
    var len = a.length
    val tmp = new Array[Double](a.length)
    while (len >= 2) {
      val half = len / 2
      var i = 0
      while (i < half) {
        val s = (a(2 * i) + a(2 * i + 1)) / Sqrt2
        val d = (a(2 * i) - a(2 * i + 1)) / Sqrt2
        tmp(i) = s
        tmp(half + i) = d
        i += 1
      }
      if (len % 2 == 1) tmp(len - 1) = a(len - 1)
      System.arraycopy(tmp, 0, a, 0, len)
      len = half
    }
  }

  /** Inverse of [[forwardHaar]]. */
  private[baselines] def inverseHaar(a: Array[Double]): Unit = {
    val n = a.length
    if (n < 2) return
    // Rebuild the level-length chain bottom-up.
    var lengths = List.empty[Int]
    var len = n
    while (len >= 2) { lengths = len :: lengths; len = len / 2 }
    val tmp = new Array[Double](n)
    lengths.foreach { l =>
      val half = l / 2
      var i = 0
      while (i < half) {
        tmp(2 * i) = (a(i) + a(half + i)) / Sqrt2
        tmp(2 * i + 1) = (a(i) - a(half + i)) / Sqrt2
        i += 1
      }
      if (l % 2 == 1) tmp(l - 1) = a(l - 1)
      System.arraycopy(tmp, 0, a, 0, l)
    }
  }
}
