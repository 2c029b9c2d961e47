package repro.baselines

import java.io.{ByteArrayInputStream, ByteArrayOutputStream}
import repro.coding.{ByteIO, Zigzag}
import repro.core.Frame

/** Compression result: the serialized payload (all metadata included) plus
  * the per-frame input→stored correspondence for fidelity metrics
  * (`null` entry = identity, for order-preserving codecs).
  */
final case class Compressed(payload: Array[Byte], perms: IndexedSeq[Array[Int]])

/** Uniform interface over LCP and the eight baselines (§8.1.3) so every
  * bench sweeps the same API: multi-frame in, one self-contained payload
  * out, frames back on decompress.
  */
trait ParticleCodec {
  def name: String

  /** False for codecs that cannot honour an arbitrary absolute bound
    * (Draco, §8.1.3) — they receive `eb` only as a quality hint. */
  def errorBounded: Boolean = true

  def compress(frames: IndexedSeq[Frame], eb: Double, batchSize: Int): Compressed

  def decompress(payload: Array[Byte]): IndexedSeq[Frame]
}

object ParticleCodec {
  /** Length-prefixed concatenation of per-frame sections. */
  def concat(sections: Seq[Array[Byte]]): Array[Byte] = {
    val out = new ByteArrayOutputStream()
    Zigzag.writeVarLong(out, sections.size.toLong)
    sections.foreach(ByteIO.writeSection(out, _))
    out.toByteArray
  }

  def split(payload: Array[Byte]): IndexedSeq[Array[Byte]] = {
    val in = new ByteArrayInputStream(payload)
    val n  = Zigzag.readVarLong(in).toInt
    IndexedSeq.fill(n)(ByteIO.readSection(in))
  }
}

/** Base for codecs that compress every frame independently. */
trait FrameWiseCodec extends ParticleCodec {
  /** Compress one frame; returns (bytes, perm-or-null). */
  def compressFrame(f: Frame, eb: Double): (Array[Byte], Array[Int])

  def decompressFrame(bytes: Array[Byte]): Frame

  final override def compress(frames: IndexedSeq[Frame], eb: Double, batchSize: Int): Compressed = {
    val results = frames.map(compressFrame(_, eb))
    Compressed(ParticleCodec.concat(results.map(_._1)), results.map(_._2))
  }

  final override def decompress(payload: Array[Byte]): IndexedSeq[Frame] =
    ParticleCodec.split(payload).map(decompressFrame)
}
