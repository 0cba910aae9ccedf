package repro.core

import org.scalatest.funsuite.AnyFunSuite

class EvictionCostSpec extends AnyFunSuite {

  test("pReuse is 0 for no rates or zero horizon") {
    assert(EvictionCost.pReuse(Nil, 10.0) == 0.0)
    assert(EvictionCost.pReuse(Seq(1.0, 2.0), 0.0) == 0.0)
  }

  test("pReuse increases with the number of sharing models (Eq. 7)") {
    val one = EvictionCost.pReuse(Seq(0.1), 1.0)
    val three = EvictionCost.pReuse(Seq(0.1, 0.1, 0.1), 1.0)
    assert(three > one)
  }

  test("pReuse increases with the horizon and saturates below 1") {
    val short = EvictionCost.pReuse(Seq(0.5), 1.0)
    val long = EvictionCost.pReuse(Seq(0.5), 10.0)
    assert(long > short && long < 1.0)
  }

  test("pReuse matches the closed form 1 - exp(-sum*t)") {
    val p = EvictionCost.pReuse(Seq(0.2, 0.3), 2.0)
    assert(math.abs(p - (1 - math.exp(-1.0))) < 1e-12)
  }

  test("pReuse rejects negative inputs") {
    intercept[IllegalArgumentException](EvictionCost.pReuse(Seq(-0.1), 1.0))
    intercept[IllegalArgumentException](EvictionCost.pReuse(Seq(0.1), -1.0))
  }

  test("expected cost is c_w + p * c_r (Eq. 6)") {
    assert(EvictionCost.expected(2.0, 4.0, 0.5) == 4.0)
    assert(EvictionCost.expected(0.0, 4.0, 0.0) == 0.0)
  }

  test("expected rejects out-of-range probabilities") {
    intercept[IllegalArgumentException](EvictionCost.expected(0, 1, 1.5))
  }
}
