package repro.coding

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.Gen
import repro.PropSupport

class DictionarySpec extends AnyFunSuite with PropSupport {

  test("empty roundtrip") {
    assert(Dictionary.decompress(Dictionary.compress(Array.emptyByteArray)).isEmpty)
  }

  test("small payload roundtrip") {
    val a = "hello particle".getBytes
    assert(Dictionary.decompress(Dictionary.compress(a)).sameElements(a))
  }

  test("repetitive payload shrinks") {
    val a = Array.fill(100000)(7.toByte)
    assert(Dictionary.compress(a).length < 1000)
  }

  test("incompressible payload grows only slightly") {
    val rng = new java.util.Random(3)
    val a = new Array[Byte](100000)
    rng.nextBytes(a)
    assert(Dictionary.compress(a).length < a.length + 1000)
  }

  test("property: roundtrip random bytes") {
    forAllG(Gen.listOf(Gen.choose(Byte.MinValue, Byte.MaxValue))) { xs =>
      val a = xs.toArray
      assert(Dictionary.decompress(Dictionary.compress(a)).sameElements(a))
    }
  }
}
