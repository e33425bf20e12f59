package repro.core

import org.scalatest.funsuite.AnyFunSuite

class MetricsSpec extends AnyFunSuite {

  private val truth = Map(1L -> 101L, 2L -> 102L, 3L -> 103L, 4L -> 104L)

  test("perfect linkage: P = R = F1 = 1") {
    val m = Metrics.prf(truth.toSeq, truth)
    assert(m.precision == 1.0 && m.recall == 1.0 && m.f1 == 1.0)
    assert(m.tp == 4 && m.fp == 0 && m.fn == 0)
  }

  test("no links: zero recall, zero precision") {
    val m = Metrics.prf(Nil, truth)
    assert(m.precision == 0.0 && m.recall == 0.0 && m.f1 == 0.0)
  }

  test("half right: counts and scores") {
    val links = Seq((1L, 101L), (2L, 999L), (3L, 103L), (9L, 109L))
    val m = Metrics.prf(links, truth)
    assert(m.tp == 2 && m.fp == 2 && m.fn == 2)
    assert(m.precision == 0.5 && m.recall == 0.5 && m.f1 == 0.5)
  }

  test("F1 is the harmonic mean of P and R") {
    val links = Seq((1L, 101L)) // P=1, R=0.25
    val m = Metrics.prf(links, truth)
    assert(math.abs(m.f1 - 2 * 1.0 * 0.25 / 1.25) < 1e-12)
  }

  test("hit precision: true partner ranked first scores 1 for that entity") {
    val scores = Map((1L, 101L) -> 9.0, (1L, 102L) -> 1.0)
    val hp = Metrics.hitPrecisionAtK(scores, Seq(1L), Map(1L -> 101L), k = 40)
    assert(hp == 1.0)
  }

  test("hit precision degrades linearly with rank") {
    val scores = Map((1L, 200L) -> 9.0, (1L, 201L) -> 8.0, (1L, 101L) -> 7.0)
    val hp = Metrics.hitPrecisionAtK(scores, Seq(1L), Map(1L -> 101L), k = 4)
    assert(math.abs(hp - (1.0 - 2.0 / 4)) < 1e-12) // rank 2 of k=4
  }

  test("rank at or past k scores 0") {
    val scores = (0 until 10).map(i => (1L, 200L + i) -> (100.0 - i)).toMap + ((1L, 101L) -> 1.0)
    val hp = Metrics.hitPrecisionAtK(scores, Seq(1L), Map(1L -> 101L), k = 5)
    assert(hp == 0.0)
  }

  test("entities without a true partner dilute the average (0.5 ceiling)") {
    val scores = Map((1L, 101L) -> 9.0, (2L, 102L) -> 9.0)
    val hp = Metrics.hitPrecisionAtK(scores, Seq(1L, 2L, 3L, 4L),
      Map(1L -> 101L, 2L -> 102L), k = 40)
    assert(hp == 0.5) // 2 perfect hits over 4 pivots
  }

  test("unscored true partner scores 0") {
    val hp = Metrics.hitPrecisionAtK(Map.empty, Seq(1L), Map(1L -> 101L), k = 40)
    assert(hp == 0.0)
  }

  test("tie-break on vid is deterministic") {
    val scores = Map((1L, 101L) -> 5.0, (1L, 100L) -> 5.0)
    // vid 100 wins the tie, pushing 101 to rank 1
    val hp = Metrics.hitPrecisionAtK(scores, Seq(1L), Map(1L -> 101L), k = 2)
    assert(math.abs(hp - 0.5) < 1e-12)
  }
}
