package repro.coding

import java.io.{ByteArrayOutputStream, InputStream}

/** The §6.2.2 coding chain for one integer array: delta coding, zigzag,
  * then *either* canonical Huffman or fixed-length packing — whichever has
  * the smaller expected size including table/header overhead (the tradeoff
  * the paper quantifies in Table 3) — ready for the final Zstd stage.
  *
  * Stream layout: flags byte (bit0 = delta, bit1 = huffman), varint count,
  * then the method-specific table/width and the length-prefixed payload.
  * The Huffman code is built once and reused for both costing and encoding.
  */
object IntCoder {
  /** Above this alphabet size Huffman degenerates: near-unique symbols get
    * ~log2(k)-bit codes plus a table rivalling the payload, while decode
    * pays a per-symbol-table parse. Such arrays (sparse block-id deltas,
    * Morton deltas) go fixed-length instead — the trailing Zstd stage
    * recovers the residual redundancy and the decode path stays a straight
    * bit-unpack. */
  private val MaxHuffmanAlphabet = 4096

  private def varintLen(n: Long): Long = math.max(1, (Zigzag.bitWidth(n) + 6) / 7).toLong

  private def prepared(a: Array[Long], delta: Boolean): Array[Long] =
    Zigzag.encodeArray(if (delta) Delta.encode(a) else a)

  private def fixedCost(z: Array[Long], n: Int): Long =
    2L + varintLen(n) + (FixedLength.widthFor(z).toLong * z.length + 7) / 8

  private def huffCost(code: Huffman.Code, freq: scala.collection.mutable.LongMap[Long], n: Int): Long =
    1L + varintLen(n) + code.tableBytes + varintLen(Int.MaxValue) + (code.payloadBits(freq) + 7) / 8

  private def buildCode(z: Array[Long]): Option[(Huffman.Code, scala.collection.mutable.LongMap[Long])] = {
    if (z.isEmpty) return None
    val freq = Huffman.frequencies(z)
    if (freq.size > MaxHuffmanAlphabet) None
    else Huffman.build(freq).map(_ -> freq)
  }

  /** Exact encoded size in bytes of each method, used for selection and by
    * the Table 3 bench: (fixedBytes, huffmanBytes); huffman is None when
    * the alphabet is too large or code lengths degenerate. */
  def methodCosts(a: Array[Long], delta: Boolean): (Long, Option[Long]) = {
    val z = prepared(a, delta)
    (fixedCost(z, a.length), buildCode(z).map { case (c, f) => huffCost(c, f, a.length) })
  }

  private def emit(z: Array[Long], n: Int, delta: Boolean, codeOpt: Option[Huffman.Code]): Array[Byte] = {
    val out = new ByteArrayOutputStream(z.length + 16)
    out.write((if (delta) 1 else 0) | (if (codeOpt.isDefined) 2 else 0))
    Zigzag.writeVarLong(out, n.toLong)
    if (n > 0) codeOpt match {
      case Some(code) =>
        code.writeTable(out)
        ByteIO.writeSection(out, Huffman.encodePayload(z, code))
      case None =>
        val width = FixedLength.widthFor(z)
        out.write(width)
        ByteIO.writeSection(out, FixedLength.encode(z, width))
    }
    out.toByteArray
  }

  /** Encode `a`, picking the cheaper of Huffman and fixed-length. */
  def encode(a: Array[Long], delta: Boolean = true): Array[Byte] = {
    val z     = prepared(a, delta)
    val built = buildCode(z)
    val useHuffman = built.exists { case (c, f) => huffCost(c, f, a.length) < fixedCost(z, a.length) }
    emit(z, a.length, delta, if (useHuffman) built.map(_._1) else None)
  }

  /** Encode with an explicit method choice (bench support for Table 3). */
  def encodeForced(a: Array[Long], delta: Boolean, useHuffman: Boolean): Array[Byte] = {
    val z = prepared(a, delta)
    emit(z, a.length, delta, if (useHuffman) buildCode(z).map(_._1) else None)
  }

  /** Decode one array written by [[encode]]/[[encodeForced]]. Zigzag and
    * delta inversion run fused, in place, over the decoded symbol array. */
  def decode(in: InputStream): Array[Long] = {
    val flags = in.read()
    require(flags >= 0, "IntCoder: EOF")
    val delta = (flags & 1) != 0
    val huff  = (flags & 2) != 0
    val n     = Zigzag.readVarLong(in).toInt
    if (n == 0) return Array.emptyLongArray
    val z =
      if (huff) {
        val dec = new Huffman.Decoder(in)
        dec.decode(new BitReader(ByteIO.readSection(in)), n)
      } else {
        val width = in.read()
        FixedLength.decode(ByteIO.readSection(in), n, width)
      }
    var prev = 0L
    var i = 0
    while (i < n) {
      val v = Zigzag.decode(z(i))
      if (delta) { prev += v; z(i) = prev } else z(i) = v
      i += 1
    }
    z
  }
}
