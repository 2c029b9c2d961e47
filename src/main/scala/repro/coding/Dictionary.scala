package repro.coding

import com.github.luben.zstd.Zstd

/** Dictionary-coding stage (§6.2.2): Zstd, exactly as the paper, via the
  * zstd-jni library that ships with the Spark distribution.
  */
object Dictionary {
  private val Level = 3

  /** Compress `bytes`; output is self-framing (original size prefix). */
  def compress(bytes: Array[Byte]): Array[Byte] = {
    val out    = new java.io.ByteArrayOutputStream(bytes.length / 2 + 16)
    Zigzag.writeVarLong(out, bytes.length.toLong)
    out.write(Zstd.compress(bytes, Level))
    out.toByteArray
  }

  /** Inverse of [[compress]]. */
  def decompress(bytes: Array[Byte]): Array[Byte] = {
    val in   = new java.io.ByteArrayInputStream(bytes)
    val size = Zigzag.readVarLong(in).toInt
    val rest = in.readAllBytes()
    if (size == 0) Array.emptyByteArray else Zstd.decompress(rest, size)
  }
}
