package repro.core

import repro.core.Quantizer.QFrame

/** Spatial block grid (§6.2.1, Eq. 6). Block side is `2·eb·p`, so a
  * particle's per-dim block index is just its quantization bin divided by
  * `p`, and its relative position inside the block is the remainder —
  * no second pass over the raw coordinates is needed.
  */
object BlockIndex {

  /** Grouping of a quantized frame into non-empty spatial blocks, with the
    * particles sorted by linearized block id.
    *
    * @param blockIds   sorted ids of the non-empty blocks (empty blocks are
    *                   never materialized — §6.2.1)
    * @param counts     particles per non-empty block (aligned with blockIds)
    * @param relX/Y/Z   relative positions (q mod p) in block order
    * @param perm       perm(i) = original index of the particle stored at i
    * @param bnx/bny    block-grid extent in x and y (needed to delinearize)
    */
  final case class Grouped(blockIds: Array[Long], counts: Array[Long],
                           relX: Array[Long], relY: Array[Long], relZ: Array[Long],
                           perm: Array[Int], bnx: Long, bny: Long)

  /** Euclidean floor-div for possibly negative bins (bins are >= 0 after
    * Eq. 5 quantization against the min, but keep this total for safety). */
  @inline private def fdiv(a: Long, b: Long): Long = Math.floorDiv(a, b)
  @inline private def fmod(a: Long, b: Long): Long = Math.floorMod(a, b)

  /** Group a quantized frame into blocks of `p` bins per side. */
  def group(qf: QFrame, p: Int): Grouped = {
    require(p >= 1, s"block size parameter p must be >= 1: $p")
    val n = qf.n
    if (n == 0)
      return Grouped(Array.emptyLongArray, Array.emptyLongArray,
        Array.emptyLongArray, Array.emptyLongArray, Array.emptyLongArray,
        Array.emptyIntArray, 1L, 1L)

    val bx = new Array[Long](n); val by = new Array[Long](n); val bz = new Array[Long](n)
    var maxBx = 0L; var maxBy = 0L
    var i = 0
    while (i < n) {
      bx(i) = fdiv(qf.qx(i), p); by(i) = fdiv(qf.qy(i), p); bz(i) = fdiv(qf.qz(i), p)
      if (bx(i) > maxBx) maxBx = bx(i)
      if (by(i) > maxBy) maxBy = by(i)
      i += 1
    }
    val bnx = maxBx + 1
    val bny = maxBy + 1
    val ids = new Array[Long](n)
    i = 0
    while (i < n) { ids(i) = bx(i) + bnx * by(i) + bnx * bny * bz(i); i += 1 }

    val perm = sortedIndicesBy(ids)

    // Walk particles in block order, emitting run-length block metadata.
    val idsB  = scala.collection.mutable.ArrayBuffer.empty[Long]
    val cntB  = scala.collection.mutable.ArrayBuffer.empty[Long]
    val relX  = new Array[Long](n); val relY = new Array[Long](n); val relZ = new Array[Long](n)
    var prev  = Long.MinValue
    i = 0
    while (i < n) {
      val j  = perm(i)
      val id = ids(j)
      if (id != prev) { idsB += id; cntB += 0L; prev = id }
      cntB(cntB.length - 1) += 1
      relX(i) = fmod(qf.qx(j), p); relY(i) = fmod(qf.qy(j), p); relZ(i) = fmod(qf.qz(j), p)
      i += 1
    }
    Grouped(idsB.toArray, cntB.toArray, relX, relY, relZ, perm, bnx, bny)
  }

  /** Indices 0..n-1 sorted ascending by key. Uses a packed primitive sort
    * (key<<24 | index) when keys and n are small enough — the common case —
    * falling back to a boxed sort for extreme grids (tiny eb, p = 1).
    */
  def sortedIndicesBy(keys: Array[Long]): Array[Int] = {
    val n = keys.length
    var maxKey = 0L
    var i = 0
    while (i < n) { if (keys(i) > maxKey) maxKey = keys(i); i += 1 }
    if (n < (1 << 24) && maxKey >= 0 && maxKey < (1L << 39)) {
      val packed = new Array[Long](n)
      i = 0
      while (i < n) { packed(i) = (keys(i) << 24) | i.toLong; i += 1 }
      java.util.Arrays.sort(packed)
      val out = new Array[Int](n)
      i = 0
      while (i < n) { out(i) = (packed(i) & 0xffffff).toInt; i += 1 }
      out
    } else {
      Array.range(0, n).sortBy(keys(_))
    }
  }

  /** Rebuild quantization bins from grouped block data (decompression side). */
  def ungroup(blockIds: Array[Long], counts: Array[Long],
              relX: Array[Long], relY: Array[Long], relZ: Array[Long],
              p: Int, bnx: Long, bny: Long): (Array[Long], Array[Long], Array[Long]) = {
    val n  = relX.length
    val qx = new Array[Long](n); val qy = new Array[Long](n); val qz = new Array[Long](n)
    var pos = 0
    var b   = 0
    while (b < blockIds.length) {
      val id  = blockIds(b)
      val bz  = fdiv(id, bnx * bny)
      val rem = id - bz * bnx * bny
      val by  = fdiv(rem, bnx)
      val bx  = rem - by * bnx
      var c = 0L
      while (c < counts(b)) {
        qx(pos) = bx * p + relX(pos)
        qy(pos) = by * p + relY(pos)
        qz(pos) = bz * p + relZ(pos)
        pos += 1
        c += 1
      }
      b += 1
    }
    require(pos == n, s"block counts ($pos) disagree with particle total ($n)")
    (qx, qy, qz)
  }
}
