package repro.coding

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.Gen
import repro.PropSupport

class DeltaZigzagSpec extends AnyFunSuite with PropSupport {

  test("delta of empty array is empty") {
    assert(Delta.encode(Array.emptyLongArray).isEmpty)
    assert(Delta.decode(Array.emptyLongArray).isEmpty)
  }

  test("delta of singleton keeps the value") {
    assert(Delta.encode(Array(42L)).sameElements(Array(42L)))
  }

  test("delta of increasing run is constant") {
    assert(Delta.encode(Array(10L, 12L, 14L, 16L)).sameElements(Array(10L, 2L, 2L, 2L)))
  }

  test("delta handles negative jumps") {
    assert(Delta.encode(Array(5L, -5L, 5L)).sameElements(Array(5L, -10L, 10L)))
  }

  test("property: delta roundtrip") {
    forAllG(Gen.listOf(Gen.choose(-1000000L, 1000000L))) { xs =>
      val a = xs.toArray
      assert(Delta.decode(Delta.encode(a)).sameElements(a))
    }
  }

  test("zigzag maps small signed to small unsigned") {
    assert(Zigzag.encode(0) == 0)
    assert(Zigzag.encode(-1) == 1)
    assert(Zigzag.encode(1) == 2)
    assert(Zigzag.encode(-2) == 3)
    assert(Zigzag.encode(2) == 4)
  }

  test("zigzag handles Long extremes") {
    assert(Zigzag.decode(Zigzag.encode(Long.MaxValue)) == Long.MaxValue)
    assert(Zigzag.decode(Zigzag.encode(Long.MinValue)) == Long.MinValue)
  }

  test("property: zigzag roundtrip") {
    forAllG(Gen.choose(Long.MinValue, Long.MaxValue)) { v => assert(Zigzag.decode(Zigzag.encode(v)) == v) }
  }

  test("varint roundtrip on boundaries") {
    val out = new java.io.ByteArrayOutputStream()
    val vals = Seq(0L, 1L, 127L, 128L, 16383L, 16384L, Long.MaxValue)
    vals.foreach(Zigzag.writeVarLong(out, _))
    val in = new java.io.ByteArrayInputStream(out.toByteArray)
    vals.foreach(v => assert(Zigzag.readVarLong(in) == v))
  }

  test("varint single byte for < 128") {
    val out = new java.io.ByteArrayOutputStream()
    Zigzag.writeVarLong(out, 127)
    assert(out.size() == 1)
  }

  test("bitWidth") {
    assert(Zigzag.bitWidth(0) == 0)
    assert(Zigzag.bitWidth(1) == 1)
    assert(Zigzag.bitWidth(255) == 8)
    assert(Zigzag.bitWidth(256) == 9)
  }

  test("property: varint roundtrip for non-negative longs") {
    forAllG(Gen.choose(0L, Long.MaxValue)) { v =>
      val out = new java.io.ByteArrayOutputStream()
      Zigzag.writeVarLong(out, v)
      assert(Zigzag.readVarLong(new java.io.ByteArrayInputStream(out.toByteArray)) == v)
    }
  }
}
