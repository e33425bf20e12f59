package repro.core

import org.scalatest.funsuite.AnyFunSuite

class TuningSpec extends AnyFunSuite {

  test("elbow of an L-shaped decreasing curve is at the corner") {
    val xs = Seq(1.0, 2.0, 3.0, 4.0, 5.0, 6.0, 7.0)
    val ys = Seq(1.0, 0.5, 0.1, 0.05, 0.04, 0.03, 0.02)
    assert(Tuning.elbow(xs, ys) == 2)
  }

  test("elbow of an exponential decay sits near the bend") {
    val xs = (0 until 20).map(_.toDouble)
    val ys = xs.map(x => math.exp(-x))
    val i = Tuning.elbow(xs, ys)
    assert(i >= 1 && i <= 4, s"elbow at $i")
  }

  test("elbow of increasing-saturating curve is at the shoulder") {
    val xs = (0 until 10).map(_.toDouble)
    val ys = Seq(0.0, 0.7, 0.9, 0.95, 0.97, 0.98, 0.985, 0.99, 0.995, 1.0)
    val i = Tuning.elbow(xs, ys)
    assert(i >= 1 && i <= 3, s"elbow at $i")
  }

  test("flat curve returns an interior point without crashing") {
    val xs = (0 until 5).map(_.toDouble)
    val ys = Seq.fill(5)(0.5)
    val i = Tuning.elbow(xs, ys)
    assert(i >= 0 && i < 5)
  }

  test("elbow rejects short inputs") {
    intercept[IllegalArgumentException](Tuning.elbow(Seq(1.0, 2.0), Seq(1.0, 2.0)))
  }

  test("elbow is invariant to axis scaling (normalization works)") {
    val xs = Seq(1.0, 2.0, 3.0, 4.0, 5.0)
    val ys = Seq(100.0, 40.0, 10.0, 8.0, 7.0)
    val i1 = Tuning.elbow(xs, ys)
    val i2 = Tuning.elbow(xs.map(_ * 1000), ys.map(_ / 1000))
    assert(i1 == i2)
  }
}
