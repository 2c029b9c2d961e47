package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.{PropSupport, TestFrames}
import repro.metrics.Metrics
import repro.core.Lcp._

class LcpSpec extends AnyFunSuite with PropSupport {

  private def checkBound(frames: IndexedSeq[Frame], r: Lcp.Result, eb: Double): Unit = {
    val dec = Lcp.decompressAll(r.archive)
    assert(dec.size == frames.size)
    frames.indices.foreach { i =>
      assert(dec(i).n == frames(i).n, s"frame $i particle count")
      assert(Metrics.withinBound(Metrics.maxAbsError(frames(i), dec(i), r.perms(i)), eb), s"frame $i bound")
    }
  }

  test("single frame archive roundtrip") {
    val frames = IndexedSeq(TestFrames.bunny(500))
    val r = Lcp.compress(frames, LcpConfig(0.01, batchSize = 8))
    checkBound(frames, r, 0.01)
    assert(r.methods == IndexedSeq('S'))
  }

  test("multi-frame roundtrip on all four multi-frame datasets") {
    for (gen <- Seq(TestFrames.copper _, TestFrames.helium _, TestFrames.lj _, TestFrames.yiip _)) {
      val frames = gen(800, 6)
      val eb = 0.02
      val r = Lcp.compress(frames, LcpConfig(eb, batchSize = 4))
      checkBound(frames, r, eb)
    }
  }

  test("coherent data selects temporal compression for most frames") {
    val frames = TestFrames.copper(2000, 8)
    val r = Lcp.compress(frames, LcpConfig(0.05, batchSize = 4))
    assert(r.methods.count(_ == 'T') >= 4, s"methods were ${r.methods}")
  }

  test("single-frame batches force spatial everywhere except anchored heads") {
    val frames = TestFrames.copper(500, 4)
    val r = Lcp.compress(frames, LcpConfig(0.02, batchSize = 1))
    // Batch heads may still be temporal thanks to anchor frames (§7.3).
    assert(r.methods.head == 'S')
  }

  test("archive serialization roundtrip") {
    val frames = TestFrames.helium(600, 5)
    val r = Lcp.compress(frames, LcpConfig(0.01, batchSize = 2))
    val restored = LcpArchive.fromBytes(r.archive.toBytes)
    assert(restored.eb == r.archive.eb)
    assert(restored.batchSize == r.archive.batchSize)
    assert(restored.entries == r.archive.entries)
    val a = Lcp.decompressAll(r.archive)
    val b = Lcp.decompressAll(restored)
    a.zip(b).foreach { case (fa, fb) =>
      assert(fa.x.sameElements(fb.x) && fa.y.sameElements(fb.y) && fa.z.sameElements(fb.z))
    }
  }

  test("decompressBatch returns exactly the batch frames") {
    val frames = TestFrames.lj(400, 10)
    val r = Lcp.compress(frames, LcpConfig(0.02, batchSize = 4))
    val all = Lcp.decompressAll(r.archive)
    val b1 = Lcp.decompressBatch(r.archive, 1) // frames 4..7
    assert(b1.size == 4)
    b1.zipWithIndex.foreach { case (f, k) =>
      assert(f.x.sameElements(all(4 + k).x))
    }
  }

  test("decompressFrame matches decompressAll for every frame") {
    val frames = TestFrames.copper(300, 9)
    val r = Lcp.compress(frames, LcpConfig(0.03, batchSize = 4))
    val all = Lcp.decompressAll(r.archive)
    frames.indices.foreach { i =>
      val f = Lcp.decompressFrame(r.archive, i)
      assert(f.x.sameElements(all(i).x), s"frame $i")
    }
  }

  test("batch independence: a batch decodes using only its own payloads plus anchors") {
    val frames = TestFrames.helium(500, 8)
    val r = Lcp.compress(frames, LcpConfig(0.02, batchSize = 4))
    val a = r.archive
    // Wipe the other batch's payloads; target batch must still decode.
    val crippled = a.copy(batches = a.batches.updated(0, a.batches(0).map(_ => Array.emptyByteArray)))
    val b1 = Lcp.decompressBatch(crippled, 1)
    val orig = Lcp.decompressBatch(a, 1)
    b1.zip(orig).foreach { case (fa, fb) => assert(fa.x.sameElements(fb.x)) }
  }

  test("anchor frames enable temporal batch heads") {
    val frames = TestFrames.copper(1500, 12)
    val r = Lcp.compress(frames, LcpConfig(0.05, batchSize = 4, ebScaleMode = Off))
    // With high coherence, some batch head beyond the first should go temporal.
    val headMethods = frames.indices.filter(_ % 4 == 0).map(r.methods)
    assert(headMethods.head == 'S')
    assert(headMethods.drop(1).contains('T'),
      s"expected an anchored temporal batch head, got $headMethods")
    checkBound(frames, r, 0.05)
  }

  test("eb scaling (Auto) tracks the micro-trial: never clearly worse than either fixed mode") {
    val frames = TestFrames.helium(1200, 12)
    val eb = 0.05
    val auto   = Lcp.compress(frames, LcpConfig(eb, batchSize = 4, ebScaleMode = Auto))
    val off    = Lcp.compress(frames, LcpConfig(eb, batchSize = 4, ebScaleMode = Off))
    val forced = Lcp.compress(frames, LcpConfig(eb, batchSize = 4, ebScaleMode = Forced(EbScale.Factor)))
    val bestFixed = math.min(off.archive.compressedSizeBytes, forced.archive.compressedSizeBytes)
    assert(auto.archive.compressedSizeBytes <= bestFixed * 1.10,
      s"Auto ${auto.archive.compressedSizeBytes} vs best fixed $bestFixed")
    checkBound(frames, auto, eb)
  }

  test("eb scaling (Auto) stays off when a single batch leaves no dependent heads") {
    val frames = TestFrames.copper(800, 8)
    val r = Lcp.compress(frames, LcpConfig(0.05, batchSize = 8, ebScaleMode = Auto))
    assert(r.archive.anchorEbScale == 1.0)
  }

  test("eb scaling stays off for incoherent data") {
    val frames = IndexedSeq(TestFrames.bunny(400), TestFrames.hacc(400), TestFrames.warpx(400))
    val r = Lcp.compress(frames, LcpConfig(0.05, batchSize = 4, ebScaleMode = Auto))
    assert(r.archive.anchorEbScale == 1.0)
  }

  test("forced eb scale factor is respected and bound still holds") {
    val frames = TestFrames.copper(600, 6)
    val r = Lcp.compress(frames, LcpConfig(0.05, batchSize = 3, ebScaleMode = Forced(10.0)))
    assert(r.archive.anchorEbScale == 10.0)
    checkBound(frames, r, 0.05)
  }

  test("disableTemporal yields all-spatial methods") {
    val frames = TestFrames.copper(500, 6)
    val r = Lcp.compress(frames, LcpConfig(0.05, batchSize = 3, disableTemporal = true))
    assert(r.methods.forall(_ == 'S'))
    checkBound(frames, r, 0.05)
  }

  test("varying particle counts across frames fall back to spatial") {
    val frames = IndexedSeq(TestFrames.bunny(300), TestFrames.bunny(301), TestFrames.bunny(302))
    val r = Lcp.compress(frames, LcpConfig(0.01, batchSize = 8))
    assert(r.methods.forall(_ == 'S'))
    checkBound(frames, r, 0.01)
  }

  test("empty frames are tolerated") {
    val frames = IndexedSeq(Frame.empty, Frame.empty)
    val r = Lcp.compress(frames, LcpConfig(0.1, batchSize = 2))
    assert(Lcp.decompressAll(r.archive).forall(_.n == 0))
  }

  test("FSM trial overhead stays low when spatial always wins") {
    // Independent surface scans: each frame is spatially compressible but
    // frame-to-frame diffs are noise, so LCP-S wins every comparison and
    // the FSM must back its LCP-T trials off exponentially.
    val frames = IndexedSeq.tabulate(40)(k => repro.data.Particles.bunZipper(500, seed = 100 + k))
    val r = Lcp.compress(frames, LcpConfig(0.01, batchSize = 40))
    assert(r.methods.count(_ == 'T') <= 2, s"methods were ${r.methods}")
    assert(r.tTrials < 15, s"too many LCP-T trials: ${r.tTrials}")
  }

  test("compression is deterministic") {
    val frames = TestFrames.yiip(400, 4)
    val a = Lcp.compress(frames, LcpConfig(0.02, batchSize = 2)).archive.toBytes
    val b = Lcp.compress(frames, LcpConfig(0.02, batchSize = 2)).archive.toBytes
    assert(a.sameElements(b))
  }

  test("batch sizes 8 and 16 both roundtrip") {
    for (bs <- Seq(8, 16)) {
      val frames = TestFrames.helium(300, 20)
      val r = Lcp.compress(frames, LcpConfig(0.02, batchSize = bs))
      checkBound(frames, r, 0.02)
    }
  }

  test("temporal batch head depends on nearest anchor, not previous batch tail") {
    val frames = TestFrames.copper(800, 12)
    val r = Lcp.compress(frames, LcpConfig(0.05, batchSize = 4))
    // Find a temporal batch head; its anchorRef must point at an anchor
    // that decodes standalone.
    val heads = frames.indices.filter(i => i % 4 == 0 && r.archive.entries(i).temporal)
    heads.foreach { i =>
      val ref = r.archive.entries(i).anchorRef
      assert(ref >= 0 && ref < r.archive.anchors.size)
      val anchor = LcpS.decompress(r.archive.anchors(ref))
      assert(anchor.n == frames(i).n)
    }
  }
}
