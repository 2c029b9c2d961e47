package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.{PropSupport, TestFrames}
import repro.metrics.Metrics

class LcpTSpec extends AnyFunSuite with PropSupport {

  test("temporal roundtrip within bound against exact previous frame") {
    val frames = TestFrames.copper(1000, 2)
    val eb = 0.01
    // Use frame 0's quantized reconstruction as basis, as LCP does.
    val s  = LcpS.compress(frames(0), eb, 64)
    val f1 = frames(1).reorder(s.perm)
    val t  = LcpT.compress(f1, s.recon, eb)
    val d  = LcpT.decompress(t.bytes, s.recon)
    assert(Metrics.withinBound(Metrics.maxAbsError(f1, d, null), eb))
  }

  test("decompressed equals compressor-side reconstruction bit-exactly") {
    val frames = TestFrames.helium(800, 2)
    val s = LcpS.compress(frames(0), 0.05, 32)
    val t = LcpT.compress(frames(1).reorder(s.perm), s.recon, 0.05)
    val d = LcpT.decompress(t.bytes, s.recon)
    (0 until d.n).foreach { i =>
      assert(d.x(i) == t.recon.x(i) && d.y(i) == t.recon.y(i) && d.z(i) == t.recon.z(i))
    }
  }

  test("high temporal correlation yields tiny diffs (smaller than LCP-S)") {
    val frames = TestFrames.copper(3000, 2)
    val eb = 0.05 // larger than the 0.02 per-frame walk step: diffs ~ 1 bin
    val s0 = LcpS.compress(frames(0), eb, 64)
    val t  = LcpT.compress(frames(1).reorder(s0.perm), s0.recon, eb)
    val s1 = LcpS.compress(frames(1), eb, 64)
    assert(t.bytes.length < s1.bytes.length,
      s"temporal ${t.bytes.length} should beat spatial ${s1.bytes.length} on coherent frames")
  }

  test("uncorrelated frames produce large temporal output") {
    val a = TestFrames.bunny(2000)
    val b = TestFrames.hacc(2000) // completely different geometry
    val sA = LcpS.compress(a, 0.01, 64)
    val t  = LcpT.compress(b.reorder(sA.perm), sA.recon, 0.01)
    val sB = LcpS.compress(b, 0.01, 64)
    assert(t.bytes.length > sB.bytes.length / 2, "temporal should not win on unrelated frames")
  }

  test("chained temporal frames stay within bound") {
    val frames = TestFrames.lj(800, 5)
    val eb = 0.02
    val s = LcpS.compress(frames(0), eb, 64)
    var basis = s.recon
    for (k <- 1 until 5) {
      val aligned = frames(k).reorder(s.perm)
      val t = LcpT.compress(aligned, basis, eb)
      val d = LcpT.decompress(t.bytes, basis)
      assert(Metrics.withinBound(Metrics.maxAbsError(aligned, d, null), eb), s"frame $k")
      basis = d
    }
  }

  test("length mismatch rejected") {
    val a = TestFrames.bunny(100)
    val b = TestFrames.bunny(101)
    intercept[IllegalArgumentException](LcpT.compress(a, b, 0.1))
  }

  test("empty frames refuse temporal (handled upstream) but n=1 works") {
    val a = Frame(Array(1.0), Array(2.0), Array(3.0))
    val b = Frame(Array(1.01), Array(2.01), Array(2.99))
    val t = LcpT.compress(b, a, 0.05)
    val d = LcpT.decompress(t.bytes, a)
    assert(Metrics.withinBound(Metrics.maxAbsError(b, d, null), 0.05))
  }

  test("property: walked frames at various eb") {
    for (eb <- Seq(1e-1, 1e-2, 1e-3)) {
      val frames = TestFrames.yiip(600, 2)
      val s = LcpS.compress(frames(0), eb, 64)
      val aligned = frames(1).reorder(s.perm)
      val t = LcpT.compress(aligned, s.recon, eb)
      val d = LcpT.decompress(t.bytes, s.recon)
      assert(Metrics.withinBound(Metrics.maxAbsError(aligned, d, null), eb), s"eb=$eb")
    }
  }
}
