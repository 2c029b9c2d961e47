package repro.baselines

import org.scalatest.funsuite.AnyFunSuite
import repro.TestFrames
import repro.core.Frame
import repro.metrics.Metrics

/** Roundtrip + error-bound conformance for every codec on several datasets
  * and bounds — the §8.2.2 compression-error check ("all compressors
  * respect the pre-defined error bound") as a test matrix.
  */
class BaselineRoundtripSpec extends AnyFunSuite {

  private val codecs: Seq[ParticleCodec] = Seq(
    Sz2Like, Sz3Like, MdzLike, ZfpLike, SperrLike, DracoLike, Tmc13Like, LcpCodec.full)

  private def multiFrameInputs: Seq[(String, IndexedSeq[Frame])] = Seq(
    "Copper" -> TestFrames.copper(600, 5),
    "Helium" -> TestFrames.helium(600, 5),
    "YIIP"   -> TestFrames.yiip(600, 5))

  private def singleFrameInputs: Seq[(String, IndexedSeq[Frame])] = Seq(
    "BUN-ZIPPER" -> IndexedSeq(TestFrames.bunny(800)),
    "HACC"       -> IndexedSeq(TestFrames.hacc(800)),
    "3DEP"       -> IndexedSeq(TestFrames.threeDep(800)))

  for {
    codec <- codecs
    (dsName, frames) <- multiFrameInputs ++ singleFrameInputs
    eb <- Seq(1e-1, 1e-2)
  } test(s"${codec.name} on $dsName at eb=$eb: counts preserved, bound respected") {
    val c   = codec.compress(frames, eb, batchSize = 4)
    val dec = codec.decompress(c.payload)
    assert(dec.size == frames.size, "frame count")
    frames.indices.foreach { i =>
      assert(dec(i).n == frames(i).n, s"particle count in frame $i")
      val err = Metrics.maxAbsError(frames(i), dec(i), c.perms(i))
      assert(Metrics.withinBound(err, eb), s"frame $i: max error $err > $eb")
    }
  }

  for (codec <- codecs) test(s"${codec.name}: empty frame list of one empty frame") {
    val frames = IndexedSeq(Frame.empty)
    val c = codec.compress(frames, 0.1, 4)
    assert(codec.decompress(c.payload).head.n == 0)
  }

  for (codec <- codecs) test(s"${codec.name}: deterministic output") {
    val frames = IndexedSeq(TestFrames.bunny(300))
    val a = codec.compress(frames, 0.05, 4).payload
    val b = codec.compress(frames, 0.05, 4).payload
    assert(a.sameElements(b))
  }

  for (codec <- codecs) test(s"${codec.name}: tighter bound never loses particles") {
    val frames = IndexedSeq(TestFrames.warpx(500))
    val c = codec.compress(frames, 1e-3, 4)
    assert(codec.decompress(c.payload).head.n == 500)
  }
}
