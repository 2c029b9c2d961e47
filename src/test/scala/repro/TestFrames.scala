package repro

import org.scalacheck.Gen
import repro.core.Frame
import repro.data.Particles

/** Shared small inputs for unit tests (SF-like scale: a few thousand
  * particles, a handful of frames — the SF=0.01 regime of the brief).
  */
object TestFrames {

  def copper(n: Int = 2000, frames: Int = 6): IndexedSeq[Frame]  = Particles.copper(n, frames, 11)
  def helium(n: Int = 2000, frames: Int = 6): IndexedSeq[Frame]  = Particles.helium(n, frames, 12)
  def lj(n: Int = 2000, frames: Int = 6): IndexedSeq[Frame]      = Particles.lj(n, frames, 13)
  def yiip(n: Int = 2000, frames: Int = 6): IndexedSeq[Frame]    = Particles.yiip(n, frames, 14)
  def bunny(n: Int = 2000): Frame                                = Particles.bunZipper(n, 15)
  def hacc(n: Int = 3000): Frame                                 = Particles.hacc(n, 16)
  def warpx(n: Int = 3000): Frame                                = Particles.warpx(n, 17)
  def threeDep(n: Int = 3000): Frame                             = Particles.threeDep(n, 18)

  /** One small frame of every dataset (names match the paper's Table 1). */
  def oneOfEach: Seq[(String, Frame)] = Seq(
    "BUN-ZIPPER" -> bunny(), "Copper" -> copper().head, "Helium" -> helium().head,
    "LJ" -> lj().head, "YIIP" -> yiip().head, "HACC" -> hacc(),
    "WarpX" -> warpx(), "3DEP" -> threeDep())

  /** Random frame generator for property tests: clustered coordinates of
    * mixed sign and scale. */
  val frameGen: Gen[Frame] = for {
    n     <- Gen.choose(0, 400)
    scale <- Gen.oneOf(1.0, 50.0, 1000.0)
    shift <- Gen.oneOf(-100.0, 0.0, 42.0)
    seed  <- Gen.choose(0L, 1000000L)
  } yield {
    val rng = new java.util.Random(seed)
    Frame(
      Array.fill(n)(shift + rng.nextDouble() * scale),
      Array.fill(n)(shift + rng.nextDouble() * scale),
      Array.fill(n)(shift + rng.nextGaussian() * scale / 4))
  }

  val ebGen: Gen[Double] = Gen.oneOf(1e-1, 1e-2, 1e-3, 0.5, 2.0)
}
