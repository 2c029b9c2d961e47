package repro.core

import org.scalatest.funsuite.AnyFunSuite

class LcpFsmSpec extends AnyFunSuite {

  test("initial action is Compare") {
    assert(new LcpFsm().nextAction() == LcpFsm.Compare)
  }

  test("spatial win doubles the skip interval") {
    val fsm = new LcpFsm
    fsm.observe(compared = true, spatialWon = true)
    assert(fsm.interval == 2)
    fsm.observe(compared = false, spatialWon = true) // skipped frame
    fsm.observe(compared = true, spatialWon = true)
    assert(fsm.interval == 4)
  }

  test("temporal win resets to compare-every-frame") {
    val fsm = new LcpFsm
    fsm.observe(compared = true, spatialWon = true)
    fsm.observe(compared = false, spatialWon = true)
    fsm.observe(compared = true, spatialWon = true)
    assert(fsm.interval == 4)
    fsm.observe(compared = false, spatialWon = true)
    fsm.observe(compared = false, spatialWon = true)
    fsm.observe(compared = false, spatialWon = true)
    fsm.observe(compared = true, spatialWon = false)
    assert(fsm.interval == 1)
    assert(fsm.nextAction() == LcpFsm.Compare)
  }

  test("backoff caps at MaxSkip") {
    val fsm = new LcpFsm
    (0 until 20).foreach { _ =>
      while (fsm.nextAction() == LcpFsm.UseSpatial) fsm.observe(compared = false, spatialWon = true)
      fsm.observe(compared = true, spatialWon = true)
    }
    assert(fsm.interval == LcpFsm.MaxSkip)
  }

  test("steady-state S-winning trial rate is below 5 percent") {
    val fsm = new LcpFsm
    var compares = 0
    val total = 10000
    (0 until total).foreach { _ =>
      fsm.nextAction() match {
        case LcpFsm.Compare =>
          compares += 1
          fsm.observe(compared = true, spatialWon = true)
        case LcpFsm.UseSpatial =>
          fsm.observe(compared = false, spatialWon = true)
      }
    }
    assert(compares.toDouble / total < 0.05, s"$compares trials out of $total")
  }

  test("alternating winners never back off past interval 2") {
    val fsm = new LcpFsm
    var spatial = true
    (0 until 20).foreach { _ =>
      val action = fsm.nextAction()
      if (action == LcpFsm.Compare) {
        fsm.observe(compared = true, spatialWon = spatial)
        spatial = !spatial
      } else fsm.observe(compared = false, spatialWon = true)
      assert(fsm.interval <= 2)
    }
  }
}
