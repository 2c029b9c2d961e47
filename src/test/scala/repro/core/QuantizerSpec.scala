package repro.core

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.Gen
import repro.{PropSupport, TestFrames}
import repro.metrics.Metrics

class QuantizerSpec extends AnyFunSuite with PropSupport {

  test("quantize/dequantize stays within eb for simple values") {
    val eb = 0.1
    for (d <- Seq(0.0, 0.05, 0.1, 0.15, 1.0, 3.14159, 99.999)) {
      val q = Quantizer.quantize(d, 0.0, eb)
      assert(Metrics.withinBound(math.abs(Quantizer.dequantize(q, 0.0, eb) - d), eb), s"d=$d")
    }
  }

  test("min value maps to bin 0 and reconstructs at min+eb") {
    val q = Quantizer.quantize(5.0, 5.0, 0.25)
    assert(q == 0)
    assert(Quantizer.dequantize(q, 5.0, 0.25) == 5.25)
  }

  test("negative coordinates supported via min shift") {
    val eb = 0.01
    val d  = -123.456
    val q  = Quantizer.quantize(d, -200.0, eb)
    assert(q >= 0)
    assert(Metrics.withinBound(math.abs(Quantizer.dequantize(q, -200.0, eb) - d), eb))
  }

  test("bin-edge values respect the bound despite fp rounding") {
    val eb = 0.1
    // Values engineered near bin edges: k*2*eb for many k.
    for (k <- 0 until 1000) {
      val d = k * 2 * eb
      val q = Quantizer.quantize(d, 0.0, eb)
      assert(Metrics.withinBound(math.abs(Quantizer.dequantize(q, 0.0, eb) - d), eb), s"k=$k")
    }
  }

  test("huge eb collapses everything to one bin") {
    val f  = TestFrames.bunny(100)
    val qf = Quantizer.quantizeFrame(f, 1e6)
    assert(qf.qx.forall(_ == 0))
  }

  test("tiny eb is near-lossless") {
    val f  = TestFrames.bunny(100)
    val qf = Quantizer.quantizeFrame(f, 1e-12)
    val r  = qf.dequantize
    (0 until f.n).foreach(i => assert(Metrics.withinBound(math.abs(r.x(i) - f.x(i)), 1e-12)))
  }

  test("zero eb rejected") {
    intercept[IllegalArgumentException](Quantizer.quantizeFrame(TestFrames.bunny(10), 0.0))
  }

  test("empty frame quantizes to empty") {
    val qf = Quantizer.quantizeFrame(Frame.empty, 0.1)
    assert(qf.n == 0 && qf.dequantize.n == 0)
  }

  test("quantizeFrame bins are non-negative") {
    val f  = TestFrames.hacc(500)
    val qf = Quantizer.quantizeFrame(f, 0.05)
    assert(qf.qx.forall(_ >= 0) && qf.qy.forall(_ >= 0) && qf.qz.forall(_ >= 0))
  }

  test("property: the error bound holds for every dataset frame and eb") {
    for ((name, f) <- TestFrames.oneOfEach; eb <- Seq(1e-1, 1e-2, 1e-3)) {
      val r = Quantizer.quantizeFrame(f, eb).dequantize
      var i = 0
      while (i < f.n) {
        assert(Metrics.withinBound(math.abs(r.x(i) - f.x(i)), eb), s"$name x($i) eb=$eb")
        assert(Metrics.withinBound(math.abs(r.y(i) - f.y(i)), eb), s"$name y($i) eb=$eb")
        assert(Metrics.withinBound(math.abs(r.z(i) - f.z(i)), eb), s"$name z($i) eb=$eb")
        i += 1
      }
    }
  }

  test("property: random frames respect bound") {
    forAllG2(TestFrames.frameGen, TestFrames.ebGen) { (f, eb) =>
      val r = Quantizer.quantizeFrame(f, eb).dequantize
      var i = 0
      while (i < f.n) {
        assert(Metrics.withinBound(math.abs(r.x(i) - f.x(i)), eb))
        i += 1
      }
    }
  }

  test("prediction-side quantization is deterministic floor") {
    assert(Quantizer.quantizeForPrediction(0.999, 0.0, 0.5) == 0)
    assert(Quantizer.quantizeForPrediction(1.0, 0.0, 0.5) == 1)
    assert(Quantizer.quantizeForPrediction(-0.1, 0.0, 0.5) == -1)
  }
}
