package repro.core

import repro.SparkSpec
import repro.mobility.MobilityGen

class MinHashCandidatesSpec extends SparkSpec {

  private val WindowSec = 900L
  private val cfg = Lsh.LshConfig(t = 0.5, sigLevel = 12, stepWindows = 16)

  test("tokenVectors: one sparse binary vector per entity with a bit per token") {
    val rows = Histories.recordsDf(spark, Seq(
      (1L, 0L, 10.0, 10.0),
      (1L, WindowSec * cfg.stepWindows, 20.0, 20.0),
      (2L, 0L, 10.0, 10.0)))
    val sig = Lsh.signatures(rows, cfg, WindowSec)
    val vecs = MinHashCandidates.tokenVectors(sig).collect()
      .map(r => r.getLong(0) -> r.getAs[org.apache.spark.ml.linalg.Vector](1)).toMap
    assert(vecs(1L).numNonzeros == 2)
    assert(vecs(2L).numNonzeros == 1)
  }

  test("MinHash candidates recover true pairs on dense generated data") {
    val ground = MobilityGen.ground(spark,
      MobilityGen.cabConfig(nEntities = 25, recordsPerEntity = 300, days = 2))
    val pair = MobilityGen.samplePair(ground, n = 12, intersectRatio = 0.5,
      inclusionProb = 0.9)
    // Jaccard over present tokens is stricter than the paper's
    // matching-positions/signature-length measure: m matching of s positions
    // gives Jaccard m/(2s - m). A paper-threshold of 0.5 corresponds to
    // Jaccard ~0.35, so the MinHash variant needs the lower cut.
    val cand = MinHashCandidates.candidatePairs(pair.e, pair.i, cfg.copy(t = 0.33), WindowSec)
      .collect().map(r => (r.getLong(0), r.getLong(1))).toSet
    val recalled = pair.truth.count { case (u, v) => cand((u, v)) }
    assert(pair.truth.nonEmpty)
    assert(recalled.toDouble / pair.truth.size >= 0.7,
      s"MinHash kept $recalled of ${pair.truth.size}")
    // and it prunes: fewer candidates than the full cross product
    val nE = pair.e.select("id").distinct().count()
    val nI = pair.i.select("id").distinct().count()
    assert(cand.size < nE * nI)
  }

  test("identical token sets always collide; disjoint distant sets do not") {
    val rows = Histories.recordsDf(spark, (0 to 5).flatMap(q => Seq(
      (1L, q * WindowSec * cfg.stepWindows + 10, 10.0, 10.0),
      (2L, q * WindowSec * cfg.stepWindows + 20, 10.0, 10.0),
      (3L, q * WindowSec * cfg.stepWindows + 30, -30.0, 140.0))))
    val e = rows.filter(org.apache.spark.sql.functions.col("id") === 1L)
    val i = rows.filter(org.apache.spark.sql.functions.col("id") =!= 1L)
    val cand = MinHashCandidates.candidatePairs(e, i, cfg, WindowSec)
      .collect().map(r => (r.getLong(0), r.getLong(1))).toSet
    assert(cand.contains((1L, 2L)))
    assert(!cand.contains((1L, 3L)))
  }
}
