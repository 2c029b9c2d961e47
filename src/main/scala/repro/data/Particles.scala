package repro.data

import java.util.Random
import repro.core.Frame

/** Synthetic stand-ins for the paper's eight particle datasets (Table 1).
  *
  * Real datasets (hundreds of GB to TB) are not available offline, so each
  * generator reproduces the two statistics LCP's mechanisms exploit — the
  * domain's *spatial structure* (lattice / gas / liquid / cluster / surface
  * / beam / terrain) and its *temporal coherence* (per-frame displacement
  * scale) — at laptop scale. Deterministic in (n, frames, seed). See
  * DESIGN.md §2 for the substitution argument.
  */
object Particles {

  /** Dataset descriptor: paper name, domain, multi-frame or not, generator. */
  final case class DatasetSpec(name: String, domain: String, multiFrame: Boolean,
                               gen: (Int, Int, Long) => IndexedSeq[Frame])

  /** All eight datasets, in the paper's Table 1 order. */
  val all: IndexedSeq[DatasetSpec] = IndexedSeq(
    DatasetSpec("BUN-ZIPPER", "Computer Vision", multiFrame = false, (n, _, s) => IndexedSeq(bunZipper(n, s))),
    DatasetSpec("Copper", "Material Science - Electronic", multiFrame = true, copper),
    DatasetSpec("Helium", "Material Science - Nuclear", multiFrame = true, helium),
    DatasetSpec("LJ", "Computational Physics", multiFrame = true, lj),
    DatasetSpec("YIIP", "Biology", multiFrame = true, yiip),
    DatasetSpec("HACC", "Cosmology", multiFrame = false, (n, _, s) => IndexedSeq(hacc(n, s))),
    DatasetSpec("WarpX", "Plasma Physics", multiFrame = false, (n, _, s) => IndexedSeq(warpx(n, s))),
    DatasetSpec("3DEP", "Geology", multiFrame = false, (n, _, s) => IndexedSeq(threeDep(n, s))),
  )

  def byName(name: String): DatasetSpec =
    all.find(_.name == name).getOrElse(sys.error(s"unknown dataset $name"))

  /** The four multi-frame datasets used in Figs. 11/13/18. */
  def multiFrame: IndexedSeq[DatasetSpec] = all.filter(_.multiFrame)

  // ---------------------------------------------------------------- helpers

  /** Evolve `base` by `frames-1` random-walk steps of per-dim stddev
    * `step(i)` for particle i — the temporal-coherence knob. */
  private def walk(base: Frame, frames: Int, step: Int => Double, rng: Random): IndexedSeq[Frame] = {
    val out = IndexedSeq.newBuilder[Frame]
    var cur = base
    out += cur
    var t = 1
    while (t < frames) {
      val n = cur.n
      val x = new Array[Double](n); val y = new Array[Double](n); val z = new Array[Double](n)
      var i = 0
      while (i < n) {
        val s = step(i)
        x(i) = cur.x(i) + rng.nextGaussian() * s
        y(i) = cur.y(i) + rng.nextGaussian() * s
        z(i) = cur.z(i) + rng.nextGaussian() * s
        i += 1
      }
      cur = Frame(x, y, z)
      out += cur
      t += 1
    }
    out.result()
  }

  /** Shuffle storage order (Fisher–Yates). §6.2: storage order of particle
    * data generally does not match spatial order, so generators whose
    * construction is spatially ordered (Copper/LJ lattice init, YIIP's
    * layout) shuffle once; atom ids then carry no spatial signal, while
    * per-index correspondence across frames (what temporal compression
    * needs) is preserved. 3DEP keeps lidar scan-line order — scan order is
    * genuinely spatial for airborne lidar. */
  private def shuffled(f: Frame, rng: Random): Frame = {
    val n    = f.n
    val perm = Array.range(0, n)
    var i = n - 1
    while (i > 0) {
      val j = rng.nextInt(i + 1)
      val t = perm(i); perm(i) = perm(j); perm(j) = t
      i -= 1
    }
    f.reorder(perm)
  }

  // ---------------------------------------------------------------- domains

  /** Copper (solid MD): atoms *vibrate around fixed lattice sites* (no
    * drift — the defining dynamics of solid-material MD, and the regime
    * MDZ's reference-frame prediction targets). Storage order is shuffled
    * atom-id order, uncorrelated with space. */
  def copper(n: Int, frames: Int, seed: Long): IndexedSeq[Frame] = {
    val rng  = new Random(seed)
    val side = math.ceil(math.cbrt(n.toDouble)).toInt
    val a0   = 3.6 // lattice constant, Å
    val sx = new Array[Double](n); val sy = new Array[Double](n); val sz = new Array[Double](n)
    var i = 0
    while (i < n) {
      sx(i) = (i % side) * a0; sy(i) = ((i / side) % side) * a0; sz(i) = (i / (side * side)) * a0
      i += 1
    }
    val sites = shuffled(Frame(sx, sy, sz), rng)
    val sigma = 0.04 // thermal vibration amplitude, Å
    IndexedSeq.fill(frames) {
      val x = new Array[Double](n); val y = new Array[Double](n); val z = new Array[Double](n)
      var j = 0
      while (j < n) {
        x(j) = sites.x(j) + rng.nextGaussian() * sigma
        y(j) = sites.y(j) + rng.nextGaussian() * sigma
        z(j) = sites.z(j) + rng.nextGaussian() * sigma
        j += 1
      }
      Frame(x, y, z)
    }
  }

  /** Helium (nuclear MD): diffuse gas in a box, small per-frame diffusion —
    * the dataset the paper's LCP-T wins most on. */
  def helium(n: Int, frames: Int, seed: Long): IndexedSeq[Frame] = {
    val rng = new Random(seed)
    val box = 60.0
    val base = Frame(
      Array.fill(n)(rng.nextDouble() * box),
      Array.fill(n)(rng.nextDouble() * box),
      Array.fill(n)(rng.nextDouble() * box))
    walk(base, frames, _ => 0.03, rng)
  }

  /** LJ (Lennard-Jones liquid): perturbed dense packing, moderate motion. */
  def lj(n: Int, frames: Int, seed: Long): IndexedSeq[Frame] = {
    val rng  = new Random(seed)
    val side = math.ceil(math.cbrt(n.toDouble)).toInt
    val a0   = 1.12 // ~2^(1/6) sigma equilibrium spacing, reduced units
    val x = new Array[Double](n); val y = new Array[Double](n); val z = new Array[Double](n)
    var i = 0
    while (i < n) {
      x(i) = (i % side) * a0 + rng.nextGaussian() * 0.15
      y(i) = ((i / side) % side) * a0 + rng.nextGaussian() * 0.15
      z(i) = (i / (side * side)) * a0 + rng.nextGaussian() * 0.15
      i += 1
    }
    walk(shuffled(Frame(x, y, z), rng), frames, _ => 0.05, rng)
  }

  /** YIIP (membrane protein MD): dense protein blob + diffuse solvent; the
    * two populations move on different scales. */
  def yiip(n: Int, frames: Int, seed: Long): IndexedSeq[Frame] = {
    val rng  = new Random(seed)
    val box  = 40.0
    val x = new Array[Double](n); val y = new Array[Double](n); val z = new Array[Double](n)
    // Storage order is shuffled (atom ids are not spatially sorted), so the
    // protein/solvent split is drawn per particle instead of by index range.
    val isProt = new Array[Boolean](n)
    var i = 0
    while (i < n) {
      isProt(i) = rng.nextDouble() < 0.3
      if (isProt(i)) {
        x(i) = box / 2 + rng.nextGaussian() * 4.0
        y(i) = box / 2 + rng.nextGaussian() * 4.0
        z(i) = box / 2 + rng.nextGaussian() * 4.0
      } else {
        x(i) = rng.nextDouble() * box
        y(i) = rng.nextDouble() * box
        z(i) = rng.nextDouble() * box
      }
      i += 1
    }
    walk(Frame(x, y, z), frames, i => if (isProt(i)) 0.02 else 0.12, rng)
  }

  /** BUN-ZIPPER (3-D scan): points on a closed deformed-sphere surface —
    * 2-D manifold embedded in 3-D, like a laser scan. Single frame. */
  def bunZipper(n: Int, seed: Long): Frame = {
    val rng = new Random(seed)
    val x = new Array[Double](n); val y = new Array[Double](n); val z = new Array[Double](n)
    var i = 0
    while (i < n) {
      val theta = math.acos(2 * rng.nextDouble() - 1)
      val phi   = rng.nextDouble() * 2 * math.Pi
      val r = 1.0 + 0.18 * math.sin(3 * theta) * math.cos(2 * phi) +
        0.09 * math.cos(5 * phi) * math.sin(2 * theta)
      val noise = 0.002
      x(i) = r * math.sin(theta) * math.cos(phi) + rng.nextGaussian() * noise
      y(i) = r * math.sin(theta) * math.sin(phi) + rng.nextGaussian() * noise
      z(i) = r * math.cos(theta) + rng.nextGaussian() * noise
      i += 1
    }
    Frame(x, y, z)
  }

  /** HACC (cosmology): halo-clustered matter — power-law halo masses at
    * uniform sites plus a diffuse component. Single frame (per-frame
    * analysis, §8.1.2). */
  def hacc(n: Int, seed: Long): Frame = {
    val rng    = new Random(seed)
    val box    = 256.0
    val nHalos = math.max(4, n / 400)
    val hx = Array.fill(nHalos)(rng.nextDouble() * box)
    val hy = Array.fill(nHalos)(rng.nextDouble() * box)
    val hz = Array.fill(nHalos)(rng.nextDouble() * box)
    val hs = Array.fill(nHalos)(0.3 + 2.5 * math.pow(rng.nextDouble(), 2.0)) // radius spread
    val x = new Array[Double](n); val y = new Array[Double](n); val z = new Array[Double](n)
    var i = 0
    while (i < n) {
      if (rng.nextDouble() < 0.25) { // diffuse background
        x(i) = rng.nextDouble() * box; y(i) = rng.nextDouble() * box; z(i) = rng.nextDouble() * box
      } else {
        // Power-law halo pick: low-index halos dominate.
        val h = math.min(nHalos - 1, (nHalos * math.pow(rng.nextDouble(), 2.5)).toInt)
        x(i) = hx(h) + rng.nextGaussian() * hs(h)
        y(i) = hy(h) + rng.nextGaussian() * hs(h)
        z(i) = hz(h) + rng.nextGaussian() * hs(h)
      }
      i += 1
    }
    Frame(x, y, z)
  }

  /** WarpX (plasma): an accelerator beam — long in x, tight in y/z, with a
    * sparse halo. Single frame. */
  def warpx(n: Int, seed: Long): Frame = {
    val rng = new Random(seed)
    val x = new Array[Double](n); val y = new Array[Double](n); val z = new Array[Double](n)
    var i = 0
    while (i < n) {
      val halo = rng.nextDouble() < 0.08
      val sYZ  = if (halo) 3.0 else 0.4
      x(i) = rng.nextGaussian() * 12.0
      y(i) = rng.nextGaussian() * sYZ
      z(i) = rng.nextGaussian() * sYZ
      i += 1
    }
    Frame(x, y, z)
  }

  /** 3DEP (lidar): jittered-grid ground sample over a smooth multi-octave
    * terrain — z is a function of (x, y) plus sensor noise. Single frame. */
  def threeDep(n: Int, seed: Long): Frame = {
    val rng  = new Random(seed)
    val span = 1000.0
    val side = math.ceil(math.sqrt(n.toDouble)).toInt
    val cell = span / side
    val x = new Array[Double](n); val y = new Array[Double](n); val z = new Array[Double](n)
    var i = 0
    while (i < n) {
      x(i) = (i % side) * cell + rng.nextDouble() * cell
      y(i) = (i / side) * cell + rng.nextDouble() * cell
      z(i) = terrain(x(i), y(i)) + rng.nextGaussian() * 0.05
      i += 1
    }
    Frame(x, y, z)
  }

  private def terrain(x: Double, y: Double): Double =
    40.0 * math.sin(x / 180.0) * math.cos(y / 140.0) +
      12.0 * math.sin(x / 47.0 + 1.3) * math.sin(y / 53.0) +
      3.0 * math.cos(x / 11.0) * math.sin(y / 13.0 + 0.7) + 60.0
}
