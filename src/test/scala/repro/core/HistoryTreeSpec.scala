package repro.core

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class HistoryTreeSpec extends AnyFunSuite {

  test("single observation: counts and dominating cell") {
    val t = HistoryTree.build(Seq((5L, 42L)))
    assert(t.winMin == 5 && t.winMax == 5)
    assert(t.counts(5, 5) == Map(42L -> 1L))
    assert(t.dominatingCell(5, 5).contains(42L))
  }

  test("duplicate observations accumulate counts") {
    val t = HistoryTree.build(Seq((1L, 7L), (1L, 7L), (1L, 8L)), span = Some((0L, 3L)))
    assert(t.counts(0, 3) == Map(7L -> 2L, 8L -> 1L))
  }

  test("range query aggregates only the requested windows") {
    val obs = Seq((0L, 1L), (1L, 1L), (2L, 2L), (3L, 2L), (3L, 2L))
    val t = HistoryTree.build(obs)
    assert(t.counts(0, 1) == Map(1L -> 2L))
    assert(t.counts(2, 3) == Map(2L -> 3L))
    assert(t.counts(1, 2) == Map(1L -> 1L, 2L -> 1L))
    assert(t.counts(0, 3) == Map(1L -> 2L, 2L -> 3L))
  }

  test("query outside the span is empty; partial overlap clips") {
    val t = HistoryTree.build(Seq((10L, 1L), (12L, 2L)))
    assert(t.counts(0, 9).isEmpty)
    assert(t.counts(13, 20).isEmpty)
    assert(t.counts(0, 10) == Map(1L -> 1L))
  }

  test("dominating cell: highest count wins, ties break to smallest cell id") {
    val t = HistoryTree.build(Seq((0L, 5L), (0L, 5L), (1L, 3L), (2L, 3L), (3L, 9L)))
    assert(t.dominatingCell(0, 0).contains(5L))     // count 2
    assert(t.dominatingCell(0, 3).contains(3L))     // 3 and 5 both count 2 -> smaller id
    assert(t.dominatingCell(3, 3).contains(9L))
    assert(t.dominatingCell(1, 2).contains(3L))
  }

  test("empty range within span returns no dominating cell") {
    val t = HistoryTree.build(Seq((0L, 1L), (10L, 2L)))
    assert(t.dominatingCell(3, 7).isEmpty)
  }

  test("explicit span supports empty histories") {
    val t = HistoryTree.build(Nil, span = Some((0L, 99L)))
    assert(t.counts(0, 99).isEmpty)
    assert(t.dominatingCell(0, 99).isEmpty)
  }

  test("leafBins lists distinct (window, cell) pairs") {
    val t = HistoryTree.build(Seq((2L, 7L), (2L, 7L), (2L, 8L), (4L, 7L)))
    assert(t.leafBins.toSet == Set((2L, 7L), (2L, 8L), (4L, 7L)))
  }

  test("randomized: tree answers equal brute-force aggregation") {
    val rnd = new Random(7)
    for (trial <- 1 to 20) {
      val span = 1 + rnd.nextInt(60)
      val obs = Seq.fill(1 + rnd.nextInt(200))(
        (rnd.nextInt(span).toLong, rnd.nextInt(8).toLong))
      val t = HistoryTree.build(obs, span = Some((0L, span - 1L)))
      for (_ <- 1 to 10) {
        val a = rnd.nextInt(span).toLong
        val b = a + rnd.nextInt(span)
        val expect = obs.filter(o => o._1 >= a && o._1 <= b)
          .groupBy(_._2).view.mapValues(_.size.toLong).toMap
        assert(t.counts(a, b) == expect, s"trial $trial range [$a,$b]")
        val expectDom =
          if (expect.isEmpty) None
          else Some(expect.toSeq.minBy { case (c, n) => (-n, c) }._1)
        assert(t.dominatingCell(a, b) == expectDom)
      }
    }
  }

  test("build rejects an empty history without a span") {
    intercept[IllegalArgumentException](HistoryTree.build(Nil))
  }
}
