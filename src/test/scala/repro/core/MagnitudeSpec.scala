package repro.core

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.Gen

class MagnitudeSpec extends AnyFunSuite {

  /** Minimal property harness: sample a scalacheck Gen n times.
    * (scalatestplus-scalacheck is not in the offline cache.)
    */
  private def forAll[A](g: Gen[A], n: Int = 100)(body: A => Unit): Unit =
    Iterator.continually(g.sample).flatten.take(n).foreach(body)

  private def forAll2[A, B](ga: Gen[A], gb: Gen[B], n: Int = 100)(body: (A, B) => Unit): Unit =
    forAll(Gen.zip(ga, gb), n)(t => body(t._1, t._2))

  test("mean of absolute values") {
    assert(Magnitude.mean(Array(-1.0, 2.0, -3.0)) == 2.0)
  }

  test("percentile endpoints are min and max of |v|") {
    val v = Array(-5.0, 1.0, 3.0, -2.0)
    assert(Magnitude.percentile(v, 0) == 1.0)
    assert(Magnitude.percentile(v, 100) == 5.0)
  }

  test("median of an odd-length array is the middle |value|") {
    assert(Magnitude.median(Array(9.0, -1.0, 5.0)) == 5.0)
  }

  test("median of an even-length array interpolates") {
    assert(Magnitude.median(Array(1.0, 2.0, 3.0, 4.0)) == 2.5)
  }

  test("thirdQuartile sits between median and max") {
    val v = Array.tabulate(101)(i => i.toDouble)
    assert(Magnitude.thirdQuartile(v) == 75.0)
  }

  test("single-element array: every percentile is that |value|") {
    assert(Magnitude.percentile(Array(-7.0), 0) == 7.0)
    assert(Magnitude.percentile(Array(-7.0), 50) == 7.0)
    assert(Magnitude.percentile(Array(-7.0), 100) == 7.0)
  }

  test("empty input is rejected") {
    intercept[IllegalArgumentException](Magnitude.mean(Array.empty[Double]))
    intercept[IllegalArgumentException](Magnitude.percentile(Array.empty[Double], 50))
  }

  test("out-of-range percentile is rejected") {
    intercept[IllegalArgumentException](Magnitude.percentile(Array(1.0), 101))
    intercept[IllegalArgumentException](Magnitude.percentile(Array(1.0), -1))
  }

  private val vecGen: Gen[Array[Double]] =
    Gen.nonEmptyListOf(Gen.chooseNum(-1e6, 1e6)).map(_.toArray)

  test("property: percentile is monotone in p and bounded by [min,max] of |v|") {
    forAll(vecGen) { v =>
      val abs = v.map(math.abs)
      val p25 = Magnitude.percentile(v, 25)
      val p75 = Magnitude.percentile(v, 75)
      assert(p25 <= p75 + 1e-9)
      assert(p25 >= abs.min - 1e-9 && p75 <= abs.max + 1e-9)
    }
  }

  test("property: mean(|v|) lies within [min,max] of |v|") {
    forAll(vecGen) { v =>
      val abs = v.map(math.abs)
      val m = Magnitude.mean(v)
      assert(m >= abs.min - 1e-9 && m <= abs.max + 1e-9)
    }
  }

  test("property: percentile is scale-equivariant") {
    forAll2(vecGen, Gen.chooseNum(0.1, 10.0)) { (v, s) =>
      val a = Magnitude.percentile(v.map(_ * s), 75)
      val b = Magnitude.percentile(v, 75) * s
      assert(math.abs(a - b) <= 1e-6 * math.max(1.0, math.abs(b)))
    }
  }
}
