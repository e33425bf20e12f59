package repro.baselines

import repro.SparkSpec
import repro.core.{Histories, Metrics}
import repro.mobility.MobilityGen

class STLinkSpec extends SparkSpec {

  private lazy val ground = MobilityGen.ground(spark,
    MobilityGen.cabConfig(nEntities = 50, recordsPerEntity = 200, days = 2)).cache()
  private lazy val pair = MobilityGen.samplePair(ground, n = 20, intersectRatio = 0.5,
    inclusionProb = 0.6)

  test("autoThreshold finds the knee of a skewed count distribution") {
    val counts = Seq.fill(50)(1L) ++ Seq.fill(10)(3L) ++ Seq(40L, 45L, 50L)
    val k = STLink.autoThreshold(counts)
    assert(k >= 2 && k <= 40, s"k=$k")
  }

  test("autoThreshold degenerate inputs fall back to 2") {
    assert(STLink.autoThreshold(Nil) == 2)
    assert(STLink.autoThreshold(Seq(5L, 5L, 5L)) == 2)
  }

  test("ST-Link links co-occurring entities and respects one-to-one-ness") {
    val r = STLink.run(spark, pair.e, pair.i, STLink.Config())
    assert(r.links.nonEmpty, "should find some links on dense co-located data")
    assert(r.links.map(_._1).distinct.size == r.links.size)
    assert(r.links.map(_._2).distinct.size == r.links.size)
    val m = Metrics.prf(r.links, pair.truth)
    assert(m.precision >= 0.8, s"ST-Link precision ${m.precision}")
    assert(m.recall >= 0.3, s"ST-Link recall ${m.recall}")
  }

  test("explicit (k, l) thresholds are honored") {
    val r = STLink.run(spark, pair.e, pair.i,
      STLink.Config(k = Some(3), l = Some(2)))
    assert(r.kUsed == 3 && r.lUsed == 2)
    // every surviving score (co-occurrence count) is >= k
    assert(r.scores.values.forall(_ >= 3.0))
  }

  test("a demanding k suppresses links") {
    val strict = STLink.run(spark, pair.e, pair.i,
      STLink.Config(k = Some(1000), l = Some(2)))
    assert(strict.links.isEmpty)
  }

  test("alibi tolerance: zero-tolerance drops cross-town pairs that co-occur by chance") {
    // u co-occurs with v in two cells but also has a distant same-window bin.
    val e = Histories.recordsDf(spark,
      (0 until 10).map(i => (1L, i * 900L + 10, 37.77, -122.42)) ++
        (0 until 10).map(i => (1L, i * 900L + 20, 37.78, -122.41)))
    val i = Histories.recordsDf(spark,
      (0 until 10).map(j => (2L, j * 900L + 400, 37.77, -122.42)) ++
        (0 until 10).map(j => (2L, j * 900L + 500, 37.78, -122.41)) ++
        (0 until 10).map(j => (2L, j * 900L + 600, 38.25, -121.70))) // ~80 km away
    val tolerant = STLink.run(spark, e, i,
      STLink.Config(k = Some(2), l = Some(2), alibiTolerance = 1000))
    val strict = STLink.run(spark, e, i,
      STLink.Config(k = Some(2), l = Some(2), alibiTolerance = 0))
    assert(tolerant.links.contains((1L, 2L)))
    assert(!strict.links.contains((1L, 2L)))
  }

  test("ambiguity removal: an entity matching two partners links to neither") {
    // v1 and v2 both co-occur heavily with u.
    def trace(id: Long, offset: Long) =
      (0 until 12).map(i => (id, i * 900L + offset, 37.77, -122.42))
    val e = Histories.recordsDf(spark, trace(1L, 10))
    val i = Histories.recordsDf(spark, trace(101L, 400) ++ trace(102L, 500))
    val r = STLink.run(spark, e, i, STLink.Config(k = Some(2), l = Some(1)))
    assert(r.links.isEmpty, "ambiguous matches must be discarded")
    assert(r.scores.keySet == Set((1L, 101L), (1L, 102L)))
  }

  test("comparisons metric counts window record pairs (no blocking)") {
    val e = Histories.recordsDf(spark, Seq((1L, 0L, 10.0, 10.0), (1L, 10L, 10.0, 10.0)))
    val i = Histories.recordsDf(spark, Seq((2L, 20L, 10.0, 10.0), (2L, 1000L, 10.0, 10.0)))
    val r = STLink.run(spark, e, i, STLink.Config(k = Some(1), l = Some(1)))
    assert(r.comparisons == 2 * 1 + 0) // window 0: 2x1; window 1: E absent
  }
}
