package repro.coding

import java.io.ByteArrayInputStream
import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.Gen
import repro.PropSupport

class IntCoderSpec extends AnyFunSuite with PropSupport {

  private def roundtrip(a: Array[Long], delta: Boolean = true): Array[Long] =
    IntCoder.decode(new ByteArrayInputStream(IntCoder.encode(a, delta)))

  test("empty array roundtrip") {
    assert(roundtrip(Array.emptyLongArray).isEmpty)
  }

  test("singleton roundtrip") {
    assert(roundtrip(Array(123456789L)).sameElements(Array(123456789L)))
  }

  test("monotone run roundtrip (delta-friendly)") {
    val a = Array.tabulate(5000)(i => 1000L + i)
    assert(roundtrip(a).sameElements(a))
  }

  test("negative values roundtrip") {
    val a = Array(-10L, 20L, -30L, 40L)
    assert(roundtrip(a).sameElements(a))
    assert(roundtrip(a, delta = false).sameElements(a))
  }

  test("delta=false roundtrip") {
    val a = Array.tabulate(1000)(i => (i * 31 % 97).toLong)
    assert(roundtrip(a, delta = false).sameElements(a))
  }

  test("constant array compresses far below fixed 8 bytes per value") {
    val a = Array.fill(10000)(42L)
    // Huffman floor is 1 bit/symbol; the chain's Zstd stage (applied by the
    // codecs over concatenated sections) removes the residual redundancy.
    val preZstd = IntCoder.encode(a)
    assert(preZstd.length < 10000 / 4)
    assert(Dictionary.compress(preZstd).length < 200)
  }

  test("monotone run much smaller than random") {
    val rng = new java.util.Random(1)
    val mono = Array.tabulate(10000)(i => i.toLong * 3)
    val rand = Array.fill(10000)(rng.nextLong() >>> 20)
    assert(IntCoder.encode(mono).length < IntCoder.encode(rand).length / 4)
  }

  test("methodCosts: huffman wins on skewed data") {
    val a = Array.fill(5000)(0L) ++ Array.tabulate(50)(_.toLong * 1000)
    val (fixed, huff) = IntCoder.methodCosts(a, delta = false)
    assert(huff.isDefined && huff.get < fixed)
  }

  test("methodCosts: fixed wins on dense uniform data") {
    // Uniform over a power-of-two alphabet: Huffman cannot beat fixed width
    // and pays its table; paper Table 3 shows this regime on Copper.
    val rng = new java.util.Random(7)
    val a = Array.fill(4096)((rng.nextInt(256)).toLong)
    val (fixed, huff) = IntCoder.methodCosts(a, delta = false)
    assert(fixed <= huff.getOrElse(Long.MaxValue) + 300) // within table overhead
  }

  test("encodeForced both methods roundtrip identically") {
    val a = Array.tabulate(2000)(i => (i % 37).toLong - 18)
    val viaH = IntCoder.decode(new ByteArrayInputStream(IntCoder.encodeForced(a, delta = true, useHuffman = true)))
    val viaF = IntCoder.decode(new ByteArrayInputStream(IntCoder.encodeForced(a, delta = true, useHuffman = false)))
    assert(viaH.sameElements(a) && viaF.sameElements(a))
  }

  test("property: roundtrip with delta") {
    forAllG(Gen.listOf(Gen.choose(-100000L, 100000L))) { xs =>
      val a = xs.toArray
      assert(roundtrip(a).sameElements(a))
    }
  }

  test("property: roundtrip without delta") {
    forAllG(Gen.listOf(Gen.choose(-100000L, 100000L))) { xs =>
      val a = xs.toArray
      assert(roundtrip(a, delta = false).sameElements(a))
    }
  }

  test("property: large-magnitude values survive") {
    forAllG(Gen.listOf(Gen.oneOf(Gen.choose(Long.MinValue / 4, Long.MaxValue / 4), Gen.const(0L)))) { xs =>
      val a = xs.toArray
      assert(roundtrip(a, delta = false).sameElements(a))
    }
  }
}
