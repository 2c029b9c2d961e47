package repro.core

/** Anchor-frame error-bound scaling (§7.4.2).
  *
  * Anchor frames feed LCP-T's prediction, so compressing them 5× tighter
  * (eb/5 — the paper's chosen knee of the diminishing-returns curve in
  * Fig. 7) makes subsequent temporal diffs smaller. The tighter bound still
  * satisfies the user's bound. The scaling only pays off when temporal
  * correlation is high, so it is gated on a quick displacement probe of the
  * first two frames.
  */
object EbScale {

  /** The paper's scale factor: anchor eb = user eb / 5. */
  val Factor = 5.0

  /** Probe sample size for the correlation gate. */
  val ProbeSize = 8192

  /** Mean per-particle quantized displacement below which frames count as
    * highly temporally correlated (a few quantization bins). */
  val MeanAbsBinThreshold = 4.0

  /** Decide whether scaling should apply: true iff the data shows high
    * temporal correlation (mean |Δq| between the first two frames small).
    */
  def highTemporalCorrelation(frames: Seq[Frame], eb: Double): Boolean = {
    if (frames.size < 2) return false
    val a = frames.head; val b = frames(1)
    if (a.n != b.n || a.n == 0) return false
    val stride = math.max(1, a.n / ProbeSize)
    var sum = 0.0
    var cnt = 0
    var i = 0
    while (i < a.n) {
      sum += (math.abs(a.x(i) - b.x(i)) + math.abs(a.y(i) - b.y(i)) + math.abs(a.z(i) - b.z(i))) / (2.0 * eb)
      cnt += 3
      i += stride
    }
    sum / cnt <= MeanAbsBinThreshold
  }
}
