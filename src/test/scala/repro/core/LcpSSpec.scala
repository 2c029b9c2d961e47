package repro.core

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.Gen
import repro.{PropSupport, TestFrames}
import repro.metrics.Metrics

class LcpSSpec extends AnyFunSuite with PropSupport {

  private def roundtrip(f: Frame, eb: Double, p: Int): (Frame, Array[Int]) = {
    val r = LcpS.compress(f, eb, p)
    (LcpS.decompress(r.bytes), r.perm)
  }

  test("empty frame roundtrip") {
    val (d, _) = roundtrip(Frame.empty, 0.1, 8)
    assert(d.n == 0)
  }

  test("single particle roundtrip within bound") {
    val f = Frame(Array(1.23), Array(-4.56), Array(7.89))
    val (d, perm) = roundtrip(f, 0.01, 8)
    assert(d.n == 1)
    assert(Metrics.withinBound(Metrics.maxAbsError(f, d, perm), 0.01))
  }

  test("decompressed frame equals compressor-side reconstruction") {
    val f = TestFrames.bunny(800)
    val r = LcpS.compress(f, 0.01, 64)
    val d = LcpS.decompress(r.bytes)
    (0 until f.n).foreach { i =>
      assert(d.x(i) == r.recon.x(i) && d.y(i) == r.recon.y(i) && d.z(i) == r.recon.z(i))
    }
  }

  test("error bound holds on every dataset at three bounds") {
    for ((name, f) <- TestFrames.oneOfEach; eb <- Seq(1e-1, 1e-2, 1e-3)) {
      val (d, perm) = roundtrip(f, eb, 64)
      assert(d.n == f.n, s"$name lost particles")
      assert(Metrics.withinBound(Metrics.maxAbsError(f, d, perm), eb), s"$name eb=$eb")
    }
  }

  test("multiset of points is preserved up to eb (no particle invented)") {
    val f = TestFrames.hacc(1000)
    val (d, perm) = roundtrip(f, 0.05, 16)
    // Each stored point must match its correspondent within eb in every dim.
    (0 until f.n).foreach { i =>
      val j = perm(i)
      assert(math.abs(d.x(i) - f.x(j)) <= 0.05)
      assert(math.abs(d.y(i) - f.y(j)) <= 0.05)
      assert(math.abs(d.z(i) - f.z(j)) <= 0.05)
    }
  }

  test("larger eb compresses smaller") {
    val f = TestFrames.threeDep(3000)
    val s1 = LcpS.compress(f, 1e-1, 64).bytes.length
    val s3 = LcpS.compress(f, 1e-3, 64).bytes.length
    assert(s1 < s3)
  }

  test("clustered data compresses better than uniform at same eb") {
    val rng = new java.util.Random(2)
    val n = 4000
    val uniform = Frame(Array.fill(n)(rng.nextDouble() * 100),
      Array.fill(n)(rng.nextDouble() * 100), Array.fill(n)(rng.nextDouble() * 100))
    val copper = TestFrames.copper(n).head // lattice: highly structured
    val su = LcpS.compress(uniform, 0.01, 64).bytes.length.toDouble / (3 * 4 * n)
    val sc = LcpS.compress(copper, 0.01, 64).bytes.length.toDouble / (3 * 4 * n)
    assert(sc < su)
  }

  test("compressed size is far below raw FP32 for realistic data") {
    val f  = TestFrames.copper(5000).head
    val sz = LcpS.compress(f, 1e-2, 64).bytes.length
    assert(sz < 3 * 4 * 5000 / 2, "expected at least 2x compression on lattice data")
  }

  test("block size affects size but never correctness") {
    val f = TestFrames.yiip(1500).head
    for (p <- Seq(1, 8, 64, 1024, 1 << 16)) {
      val (d, perm) = roundtrip(f, 0.01, p)
      assert(Metrics.withinBound(Metrics.maxAbsError(f, d, perm), 0.01), s"p=$p")
    }
  }

  test("identical input compresses deterministically") {
    val f = TestFrames.lj(500).head
    val a = LcpS.compress(f, 0.01, 64).bytes
    val b = LcpS.compress(f, 0.01, 64).bytes
    assert(a.sameElements(b))
  }

  test("sectionCosts reports positive sizes and relPos dominated by block count tradeoff") {
    val f = TestFrames.helium(2000).head
    val c = LcpS.sectionCosts(f, 1e-2, 64)
    assert(c.blockIdFixed > 0 && c.countFixed > 0 && c.relPosFixed > 0)
  }

  test("duplicate particles survive") {
    val f = Frame(Array(1.0, 1.0, 1.0), Array(2.0, 2.0, 2.0), Array(3.0, 3.0, 3.0))
    val (d, perm) = roundtrip(f, 0.1, 8)
    assert(d.n == 3)
    assert(Metrics.withinBound(Metrics.maxAbsError(f, d, perm), 0.1))
  }

  test("property: random frames roundtrip within bound for random p") {
    val pGen = Gen.oneOf(1, 2, 16, 128, 4096)
    forAllG2(TestFrames.frameGen, pGen) { (f, p) =>
      val eb = 0.05
      val (d, perm) = roundtrip(f, eb, p)
      assert(d.n == f.n)
      assert(Metrics.withinBound(Metrics.maxAbsError(f, d, perm), eb))
    }
  }
}
