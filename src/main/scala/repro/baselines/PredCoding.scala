package repro.baselines

import repro.core.Quantizer

/** Shared residual quantization for prediction-based baselines (SZ-family):
  * delegates to the core error-bound-aware residual scheme so baselines and
  * LCP-T quantize residuals identically (bit-for-bit comparable sizes).
  */
object PredCoding {

  /** Quantize `v` against `pred`; |v − recon(pred, q, eb)| ≤ eb. */
  @inline def quantResidual(v: Double, pred: Double, eb: Double): Long =
    Quantizer.quantizeResidual(v, pred, eb)

  @inline def recon(pred: Double, q: Long, eb: Double): Double =
    Quantizer.reconResidual(pred, q, eb)
}
