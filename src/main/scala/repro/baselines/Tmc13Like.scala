package repro.baselines

import java.io.{ByteArrayInputStream, ByteArrayOutputStream}
import repro.coding.{ByteIO, Dictionary, IntCoder, Zigzag}
import repro.core.{BlockIndex, Frame, Quantizer}

/** TMC13-style baseline (MPEG G-PCC): octree geometry coding. Positions are
  * quantized on the error-bound grid, Morton-ordered, and the occupied
  * octree is serialized as one occupancy byte per internal node (depth-first
  * over the sorted code ranges) plus per-leaf duplicate counts; both streams
  * go through Zstd. Error-bounded (bin centres), order lost.
  */
object Tmc13Like extends FrameWiseCodec {
  override val name = "TMC13"

  override def compressFrame(f: Frame, eb: Double): (Array[Byte], Array[Int]) = {
    val (mx, my, mz) = f.mins
    val qx = Quantizer.quantizeArray(f.x, mx, eb)
    val qy = Quantizer.quantizeArray(f.y, my, eb)
    val qz = Quantizer.quantizeArray(f.z, mz, eb)
    var maxQ = 0L
    var i = 0
    while (i < f.n) {
      maxQ = math.max(maxQ, math.max(qx(i), math.max(qy(i), qz(i))))
      i += 1
    }
    val depth = math.max(1, repro.coding.Zigzag.bitWidth(maxQ))
    require(depth <= Morton.MaxBits,
      s"TMC13 grid needs $depth bits/dim (> ${Morton.MaxBits}); raise the error bound")

    val codes = new Array[Long](f.n)
    i = 0
    while (i < f.n) { codes(i) = Morton.encode(qx(i), qy(i), qz(i)); i += 1 }
    val perm   = BlockIndex.sortedIndicesBy(codes)
    val sorted = new Array[Long](f.n)
    i = 0
    while (i < f.n) { sorted(i) = codes(perm(i)); i += 1 }

    val occ  = new ByteArrayOutputStream(f.n / 2 + 16)
    val dups = scala.collection.mutable.ArrayBuffer.empty[Long]

    def emit(start: Int, end: Int, level: Int): Unit = {
      if (level == 0) { dups += (end - start).toLong; return }
      val shift = 3 * (level - 1)
      // Children are contiguous runs of the sorted codes; find boundaries.
      var occByte = 0
      var s = start
      val bounds = new Array[Int](9)
      bounds(0) = start
      var child = 0
      while (child < 8) {
        var e = s
        while (e < end && ((sorted(e) >> shift) & 7) == child) e += 1
        if (e > s) occByte |= (1 << child)
        bounds(child + 1) = e
        s = e
        child += 1
      }
      occ.write(occByte)
      child = 0
      while (child < 8) {
        if (bounds(child + 1) > bounds(child)) emit(bounds(child), bounds(child + 1), level - 1)
        child += 1
      }
    }
    if (f.n > 0) emit(0, f.n, depth)

    val out = new ByteArrayOutputStream(f.n + 64)
    Zigzag.writeVarLong(out, f.n.toLong)
    ByteIO.writeDouble(out, eb)
    ByteIO.writeDouble(out, mx); ByteIO.writeDouble(out, my); ByteIO.writeDouble(out, mz)
    out.write(depth)
    val body = new ByteArrayOutputStream()
    ByteIO.writeSection(body, occ.toByteArray)
    ByteIO.writeSection(body, IntCoder.encode(dups.toArray, delta = false))
    ByteIO.writeSection(out, Dictionary.compress(body.toByteArray))
    (out.toByteArray, perm)
  }

  override def decompressFrame(bytes: Array[Byte]): Frame = {
    val in = new ByteArrayInputStream(bytes)
    val n  = Zigzag.readVarLong(in).toInt
    val eb = ByteIO.readDouble(in)
    val mx = ByteIO.readDouble(in); val my = ByteIO.readDouble(in); val mz = ByteIO.readDouble(in)
    val depth = in.read()
    val body  = new ByteArrayInputStream(Dictionary.decompress(ByteIO.readSection(in)))
    val occ   = ByteIO.readSection(body)
    val dups  = IntCoder.decode(new ByteArrayInputStream(ByteIO.readSection(body)))

    val x = new Array[Double](n); val y = new Array[Double](n); val z = new Array[Double](n)
    var occPos  = 0
    var dupPos  = 0
    var outPos  = 0

    def walk(prefix: Long, level: Int): Unit = {
      if (level == 0) {
        val (qx, qy, qz) = Morton.decode(prefix)
        val px = Quantizer.dequantize(qx, mx, eb)
        val py = Quantizer.dequantize(qy, my, eb)
        val pz = Quantizer.dequantize(qz, mz, eb)
        var c = dups(dupPos); dupPos += 1
        while (c > 0) { x(outPos) = px; y(outPos) = py; z(outPos) = pz; outPos += 1; c -= 1 }
        return
      }
      val occByte = occ(occPos) & 0xff; occPos += 1
      var child = 0
      while (child < 8) {
        if ((occByte & (1 << child)) != 0) walk((prefix << 3) | child, level - 1)
        child += 1
      }
    }
    if (n > 0) walk(0L, depth)
    require(outPos == n, s"octree decoded $outPos of $n points")
    Frame(x, y, z)
  }
}
