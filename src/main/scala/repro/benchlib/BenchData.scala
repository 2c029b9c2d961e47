package repro.benchlib

import repro.baselines._
import repro.core.Frame
import repro.data.Particles

/** Bench-scale inputs and the codec roster (§8.1).
  *
  * Sizes target the SF≈0.1 regime of the brief (~100 MB of work overall):
  * the paper's datasets are GB–TB scale, ours keep the same structure at
  * 10⁴–10⁵ particles (see DESIGN.md §2). Override with BENCH_MULTI_N /
  * BENCH_SINGLE_N / BENCH_FRAMES for larger runs.
  */
object BenchData {

  val MultiN: Int      = sys.env.getOrElse("BENCH_MULTI_N", "40000").toInt
  val MultiFrames: Int = sys.env.getOrElse("BENCH_FRAMES", "32").toInt
  val SingleN: Int     = sys.env.getOrElse("BENCH_SINGLE_N", "100000").toInt

  /** All eight codecs of §8.1.3 minus TMC2, excluded exactly as the paper
    * excludes it (§8.2: point-count not preserved, 16-bit-only
    * quantization, 200–50 000× slower). */
  val codecs: Seq[ParticleCodec] = Seq(
    LcpCodec.full, Sz2Like, Sz3Like, MdzLike, ZfpLike, SperrLike, DracoLike, Tmc13Like)

  /** Multi-frame bench inputs (cached: generation is deterministic). */
  lazy val multiFrame: Seq[(String, IndexedSeq[Frame])] =
    Particles.multiFrame.map(s => s.name -> s.gen(MultiN, MultiFrames, 1000 + s.name.hashCode % 100))

  /** Single-frame inputs for all eight datasets (multi-frame sets contribute
    * their middle frame, as in §8.2.4). */
  lazy val singleFrame: Seq[(String, Frame)] =
    Particles.all.map { s =>
      if (s.multiFrame) s.name -> s.gen(SingleN, MultiFrames, 2000)(MultiFrames / 2)
      else s.name -> s.gen(SingleN, 1, 2000).head
    }

  val PaperEbs: Seq[Double] = Seq(1e-1, 1e-2, 1e-3)
}
