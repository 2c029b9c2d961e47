package repro.core

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.Gen
import repro.{PropSupport, TestFrames}

class BlockIndexSpec extends AnyFunSuite with PropSupport {

  private def groupOf(f: Frame, eb: Double, p: Int) =
    BlockIndex.group(Quantizer.quantizeFrame(f, eb), p)

  test("empty frame groups to zero blocks") {
    val g = groupOf(Frame.empty, 0.1, 8)
    assert(g.blockIds.isEmpty && g.counts.isEmpty && g.perm.isEmpty)
  }

  test("single particle lands in one block with rel pos < p") {
    val f = Frame(Array(3.7), Array(1.2), Array(9.9))
    val g = groupOf(f, 0.1, 8)
    assert(g.blockIds.length == 1 && g.counts.sameElements(Array(1L)))
    assert(g.relX(0) >= 0 && g.relX(0) < 8)
  }

  test("block ids are sorted and unique") {
    val g = groupOf(TestFrames.hacc(2000), 0.05, 16)
    assert(g.blockIds.toSeq == g.blockIds.toSeq.sorted)
    assert(g.blockIds.distinct.length == g.blockIds.length)
  }

  test("counts sum to particle total and are positive (no empty blocks)") {
    val g = groupOf(TestFrames.threeDep(2000), 0.01, 64)
    assert(g.counts.sum == 2000)
    assert(g.counts.forall(_ > 0))
  }

  test("relative positions bounded by p in all dims") {
    for (p <- Seq(1, 2, 8, 64, 1024)) {
      val g = groupOf(TestFrames.warpx(1000), 0.01, p)
      assert(g.relX.forall(r => r >= 0 && r < p), s"p=$p")
      assert(g.relY.forall(r => r >= 0 && r < p), s"p=$p")
      assert(g.relZ.forall(r => r >= 0 && r < p), s"p=$p")
    }
  }

  test("perm is a permutation") {
    val g = groupOf(TestFrames.bunny(1500), 0.01, 8)
    assert(g.perm.sorted.sameElements(Array.range(0, 1500)))
  }

  test("ungroup inverts group") {
    val f  = TestFrames.lj(1200).head
    val qf = Quantizer.quantizeFrame(f, 0.02)
    val g  = BlockIndex.group(qf, 32)
    val (qx, qy, qz) = BlockIndex.ungroup(g.blockIds, g.counts, g.relX, g.relY, g.relZ, 32, g.bnx, g.bny)
    var i = 0
    while (i < f.n) {
      val j = g.perm(i)
      assert(qx(i) == qf.qx(j) && qy(i) == qf.qy(j) && qz(i) == qf.qz(j))
      i += 1
    }
  }

  test("p=1 gives one block per occupied bin with zero rel positions") {
    val g = groupOf(TestFrames.copper(500).head, 0.1, 1)
    assert(g.relX.forall(_ == 0) && g.relY.forall(_ == 0) && g.relZ.forall(_ == 0))
  }

  test("huge p puts everything into a single block") {
    val g = groupOf(TestFrames.bunny(300), 0.1, 1 << 16)
    assert(g.blockIds.length == 1)
    assert(g.counts(0) == 300)
  }

  test("sortedIndicesBy matches boxed sort on packed fast path") {
    val rng  = new java.util.Random(5)
    val keys = Array.fill(5000)(rng.nextLong() & ((1L << 38) - 1))
    val got  = BlockIndex.sortedIndicesBy(keys)
    val exp  = Array.range(0, 5000).sortBy(keys(_))
    assert(got.map(keys(_)).sameElements(exp.map(keys(_))))
  }

  test("sortedIndicesBy falls back for huge keys") {
    val keys = Array(1L << 45, 5L, 1L << 44, 0L)
    val got  = BlockIndex.sortedIndicesBy(keys)
    assert(got.sameElements(Array(3, 1, 2, 0)))
  }

  test("sort is stable on ties (packed path keeps original order)") {
    val keys = Array(7L, 7L, 7L, 1L)
    val got  = BlockIndex.sortedIndicesBy(keys)
    assert(got.sameElements(Array(3, 0, 1, 2)))
  }

  test("property: group/ungroup roundtrip on random frames") {
    val pGen = Gen.oneOf(1, 4, 8, 64, 512)
    forAllG2(TestFrames.frameGen, pGen) { (f, p) =>
      val qf = Quantizer.quantizeFrame(f, 0.05)
      val g  = BlockIndex.group(qf, p)
      val (qx, qy, qz) = BlockIndex.ungroup(g.blockIds, g.counts, g.relX, g.relY, g.relZ, p, g.bnx, g.bny)
      var i = 0
      while (i < f.n) {
        val j = g.perm(i)
        assert(qx(i) == qf.qx(j) && qy(i) == qf.qy(j) && qz(i) == qf.qz(j))
        i += 1
      }
    }
  }
}
