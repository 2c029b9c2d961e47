package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.TestFrames

class OptSpec extends AnyFunSuite {

  test("candidates are the 17 powers of two of §7.4.1") {
    assert(BlockSizeOpt.Candidates == (0 to 16).map(1 << _))
  }

  test("sample keeps small frames intact") {
    val f = TestFrames.bunny(1000)
    assert(BlockSizeOpt.sample(f).n == 1000)
  }

  test("sample strides large frames down to the cap") {
    val f = TestFrames.hacc(BlockSizeOpt.SampleSize * 2)
    assert(BlockSizeOpt.sample(f).n == BlockSizeOpt.SampleSize)
  }

  test("best block size is a candidate minimizing the sampled size") {
    val (p, sizes) = BlockSizeOpt.bestBlockSize(TestFrames.copper(2000).head, 0.01)
    assert(BlockSizeOpt.Candidates.contains(p))
    // Oversized-block candidates are pruned (they all collapse to one block).
    assert(sizes.keySet.subsetOf(BlockSizeOpt.Candidates.toSet))
    assert(sizes.nonEmpty && sizes(p) == sizes.values.min)
  }

  test("optimized block size reaches >= 85% of best-candidate CR on every dataset") {
    // The paper's Fig. 6 claim, evaluated with the full frame as ground truth.
    for ((name, f) <- TestFrames.oneOfEach) {
      val eb = 0.01
      val (pOpt, _) = BlockSizeOpt.bestBlockSize(f, eb)
      val sizeOpt = LcpS.compress(f, eb, pOpt).bytes.length.toDouble
      val sizeBest = BlockSizeOpt.Candidates.map(p => LcpS.compress(f, eb, p).bytes.length).min.toDouble
      val ratio = sizeBest / sizeOpt // CR ratio = inverse size ratio
      assert(ratio >= 0.85, f"$name: optimizer reached only ${ratio * 100}%.1f%% of best CR")
    }
  }

  test("empty frame falls back to first candidate") {
    val (p, sizes) = BlockSizeOpt.bestBlockSize(Frame.empty, 0.1)
    assert(p == BlockSizeOpt.Candidates.head && sizes.isEmpty)
  }

  test("correlation gate: coherent copper passes, shuffled does not") {
    val frames = TestFrames.copper(1000, 2)
    assert(EbScale.highTemporalCorrelation(frames, 0.05))
    val shuffled = IndexedSeq(frames(0), TestFrames.hacc(1000))
    assert(!EbScale.highTemporalCorrelation(shuffled, 0.05))
  }

  test("correlation gate: single frame never passes") {
    assert(!EbScale.highTemporalCorrelation(Seq(TestFrames.bunny(100)), 0.1))
  }

  test("correlation gate: mismatched counts never pass") {
    assert(!EbScale.highTemporalCorrelation(
      Seq(TestFrames.bunny(100), TestFrames.bunny(101)), 0.1))
  }

  test("correlation gate depends on eb (coarse bound absorbs motion)") {
    val frames = TestFrames.lj(1000, 2) // step 0.05
    assert(EbScale.highTemporalCorrelation(frames, 0.1))   // motion ≪ bin
    assert(!EbScale.highTemporalCorrelation(frames, 1e-4)) // motion ≫ bin
  }
}
