package repro.core

import org.scalatest.funsuite.AnyFunSuite

class DsdCostModelSpec extends AnyFunSuite {

  test("calibration yields a positive, sane alpha (build costs more than probe)") {
    val c = DsdCostModel.calibrate(sizes = Seq(20000, 50000), k = 2)
    assert(c.alpha > 0.5, s"alpha ${c.alpha} implausibly low")
    assert(c.alpha < 100.0, s"alpha ${c.alpha} implausibly high")
    assert(c.samples.size == 2)
  }

  test("calibration is repeatable within an order of magnitude") {
    val a = DsdCostModel.calibrate(sizes = Seq(30000), k = 2).alpha
    val b = DsdCostModel.calibrate(sizes = Seq(30000), k = 2).alpha
    assert(a / b < 10 && b / a < 10)
  }
}
