package repro.data

import org.scalatest.funsuite.AnyFunSuite
import repro.metrics.Metrics

class ParticlesSpec extends AnyFunSuite {

  test("registry lists the paper's eight datasets") {
    assert(Particles.all.map(_.name) == IndexedSeq(
      "BUN-ZIPPER", "Copper", "Helium", "LJ", "YIIP", "HACC", "WarpX", "3DEP"))
  }

  test("exactly four datasets are multi-frame (Copper, Helium, LJ, YIIP)") {
    assert(Particles.multiFrame.map(_.name) == IndexedSeq("Copper", "Helium", "LJ", "YIIP"))
  }

  test("byName resolves and rejects") {
    assert(Particles.byName("HACC").domain == "Cosmology")
    intercept[RuntimeException](Particles.byName("nope"))
  }

  test("generators are deterministic in (n, frames, seed)") {
    for (spec <- Particles.all) {
      val a = spec.gen(500, 3, 42)
      val b = spec.gen(500, 3, 42)
      a.zip(b).foreach { case (fa, fb) =>
        assert(fa.x.sameElements(fb.x) && fa.y.sameElements(fb.y) && fa.z.sameElements(fb.z))
      }
    }
  }

  test("different seeds differ") {
    val a = Particles.hacc(500, 1)
    val b = Particles.hacc(500, 2)
    assert(!a.x.sameElements(b.x))
  }

  test("requested particle count is honoured") {
    for (spec <- Particles.all; n <- Seq(1, 100, 1234)) {
      val frames = spec.gen(n, 2, 7)
      assert(frames.forall(_.n == n), s"${spec.name} n=$n")
    }
  }

  test("multi-frame generators produce the requested frame count") {
    for (spec <- Particles.multiFrame) {
      assert(spec.gen(100, 7, 1).size == 7, spec.name)
    }
  }

  test("frames evolve (consecutive frames differ but are close)") {
    for (spec <- Particles.multiFrame) {
      val frames = spec.gen(500, 2, 3)
      val (a, b) = (frames(0), frames(1))
      assert(!a.x.sameElements(b.x), s"${spec.name} should move")
      val meanStep = (0 until a.n).map(i => math.abs(a.x(i) - b.x(i))).sum / a.n
      assert(meanStep < 1.0, s"${spec.name} moves too fast: $meanStep")
    }
  }

  test("copper is more temporally coherent than yiip solvent") {
    val cu = Particles.copper(1000, 2, 5)
    val yi = Particles.yiip(1000, 2, 5)
    def meanStep(fs: IndexedSeq[repro.core.Frame]) =
      (0 until fs(0).n).map(i => math.abs(fs(0).x(i) - fs(1).x(i))).sum / fs(0).n
    assert(meanStep(cu) < meanStep(yi))
  }

  test("bunny points lie near the unit surface") {
    val f = Particles.bunZipper(2000, 1)
    (0 until f.n).foreach { i =>
      val r = math.sqrt(f.x(i) * f.x(i) + f.y(i) * f.y(i) + f.z(i) * f.z(i))
      assert(r > 0.5 && r < 1.5, s"r=$r")
    }
  }

  test("hacc is clustered: blocked entropy far below uniform") {
    val f = Particles.hacc(5000, 1)
    val rng = new java.util.Random(0)
    val u = repro.core.Frame(
      Array.fill(5000)(rng.nextDouble() * 256),
      Array.fill(5000)(rng.nextDouble() * 256),
      Array.fill(5000)(rng.nextDouble() * 256))
    def blockedEntropy(fr: repro.core.Frame): Double = {
      val qf = repro.core.Quantizer.quantizeFrame(fr, 0.01)
      val g  = repro.core.BlockIndex.group(qf, 64)
      Metrics.shannonEntropy(g.blockIds)
    }
    assert(blockedEntropy(f) < blockedEntropy(u))
  }

  test("warpx beam is anisotropic (x spread much larger than y)") {
    val f = Particles.warpx(5000, 1)
    def std(a: Array[Double]) = { val m = a.sum / a.length; math.sqrt(a.map(v => (v - m) * (v - m)).sum / a.length) }
    assert(std(f.x) > 5 * std(f.y))
  }

  test("3DEP z is a smooth function of x,y (terrain, not volume)") {
    val f = Particles.threeDep(5000, 1)
    // z range must be far smaller than the xy span.
    assert(f.z.max - f.z.min < (f.x.max - f.x.min) / 3)
  }
}
