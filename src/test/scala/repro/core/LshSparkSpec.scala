package repro.core

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}
import repro.mobility.MobilityGen

/** DataFrame LSH stages: signatures, banding, candidate generation. */
class LshSparkSpec extends SparkSpec {

  private val WindowSec = 900L
  private val cfg = Lsh.LshConfig(t = 0.6, sigLevel = 12, stepWindows = 4, numBuckets = 4096)

  private lazy val records = MobilityGen
    .ground(spark, MobilityGen.cabConfig(nEntities = 25, recordsPerEntity = 80, days = 2))
    .cache()

  test("signatures match the HistoryTree's dominating-cell queries") {
    val sig = Lsh.signatures(records, cfg, WindowSec).collect()
      .map(r => ((r.getLong(0), r.getLong(1)), r.getLong(2))).toMap
    val local = records.collect()
      .map(r => (r.getLong(0), r.getLong(1), r.getDouble(2), r.getDouble(3)))
      .groupBy(_._1)
    val qSec = WindowSec * cfg.stepWindows
    for ((id, rows) <- local) {
      val obs = rows.toSeq.map(r =>
        (math.floorDiv(r._2, WindowSec), Grid.cellOf(r._3, r._4, cfg.sigLevel)))
      val tree = HistoryTree.build(obs)
      val qIdxs = rows.map(r => math.floorDiv(r._2, qSec)).distinct
      for (q <- qIdxs) {
        val lo = q * qSec / WindowSec
        val hi = (q + 1) * qSec / WindowSec - 1
        assert(sig.get((id, q)) == tree.dominatingCell(lo, hi),
          s"entity $id query window $q")
      }
    }
  }

  test("signatures match DuckDB argmax (oracle)") {
    val ux = udf((c: Long) => Grid.xOf(c)); val uy = udf((c: Long) => Grid.yOf(c))
    val ours = Lsh.signatures(records, cfg, WindowSec)
      .select(col("id"), col("qidx"), ux(col("cell")).as("x"), uy(col("cell")).as("y"))
    val lvl = cfg.sigLevel; val n = 1 << lvl; val qSec = WindowSec * cfg.stepWindows
    Oracle.assertEquivalent(
      ours,
      s"""
         |WITH bins AS (
         |  SELECT CAST(id AS BIGINT) AS id,
         |         CAST(floor(CAST(ts AS DOUBLE) / $qSec) AS BIGINT) AS qidx,
         |         CAST(least(${n - 1}, floor((CAST(lon AS DOUBLE) + 180.0) / 360.0 * $n)) AS BIGINT) AS x,
         |         CAST(least(${n - 1}, floor((CAST(lat AS DOUBLE) + 90.0) / 180.0 * $n)) AS BIGINT) AS y,
         |         COUNT(*) AS cnt
         |  FROM records GROUP BY ALL
         |), ranked AS (
         |  SELECT id, qidx, x, y,
         |         row_number() OVER (PARTITION BY id, qidx
         |                            ORDER BY cnt DESC, x * ${1L << 29} + y ASC) AS rk
         |  FROM bins
         |)
         |SELECT id, qidx, x, y FROM ranked WHERE rk = 1
         |""".stripMargin,
      "records" -> records)
  }

  test("an entity with no records in a query window has no signature row there") {
    val rows = Histories.recordsDf(spark, Seq(
      (1L, 0L, 10.0, 10.0),                      // query window 0
      (1L, WindowSec * cfg.stepWindows * 3, 10.0, 10.0))) // query window 3
    val qs = Lsh.signatures(rows, cfg, WindowSec).select("qidx").collect()
      .map(_.getLong(0)).sorted
    assert(qs.toSeq == Seq(0L, 3L))
  }

  test("bandHashes: identical signatures collide on every band") {
    val rows = Histories.recordsDf(spark,
      (0 to 7).flatMap(q => Seq(
        (1L, q * WindowSec * cfg.stepWindows, 10.0, 10.0),
        (2L, q * WindowSec * cfg.stepWindows, 10.0, 10.0))))
    val sig = Lsh.signatures(rows, cfg, WindowSec)
    val bands = Lsh.bandHashes(sig, qMin = 0, r = 2, numBuckets = 4096).collect()
      .map(r => (r.getLong(0), r.getLong(1), r.getInt(2)))
    val b1 = bands.filter(_._1 == 1).map(b => (b._2, b._3)).toSet
    val b2 = bands.filter(_._1 == 2).map(b => (b._2, b._3)).toSet
    assert(b1 == b2 && b1.size == 4) // 8 query windows / r=2 -> 4 bands
  }

  test("bandHashes omits all-placeholder bands") {
    val rows = Histories.recordsDf(spark, Seq(
      (1L, 0L, 10.0, 10.0))) // only query window 0
    val sig = Lsh.signatures(rows, cfg, WindowSec)
    val bands = Lsh.bandHashes(sig, qMin = 0, r = 2, numBuckets = 4096).collect()
    assert(bands.length == 1 && bands.head.getLong(1) == 0L)
  }

  test("candidates: co-located entities collide, far entities do not") {
    // Entities 1 and 2 share all dominating cells; 3 lives on another continent.
    val rows = Histories.recordsDf(spark, (0 to 7).flatMap(q => Seq(
      (1L, q * WindowSec * cfg.stepWindows + 60, 10.0, 10.0),
      (2L, q * WindowSec * cfg.stepWindows + 120, 10.0, 10.0),
      (3L, q * WindowSec * cfg.stepWindows + 60, -30.0, 140.0))))
    val e = rows.filter(col("id") === 1L)
    val i = rows.filter(col("id") =!= 1L).withColumn("id", col("id") + 100)
    val (cand, sigLen, b, r) = Lsh.candidatePairs(e, i, cfg, WindowSec)
    val pairs = cand.collect().map(x => (x.getLong(0), x.getLong(1))).toSet
    assert(sigLen == 8 && b >= 1 && r >= 1)
    assert(pairs.contains((1L, 102L)))
    assert(!pairs.contains((1L, 103L)))
  }

  test("candidate recall: most true pairs survive LSH filtering on generated data") {
    // Dense records + long query windows make dominating cells stable across
    // the two samples — the regime where the paper's LSH retains recall.
    val dense = MobilityGen.ground(spark,
      MobilityGen.cabConfig(nEntities = 25, recordsPerEntity = 300, days = 2))
    val pair = MobilityGen.samplePair(dense, n = 12, intersectRatio = 0.5,
      inclusionProb = 0.9)
    val denseCfg = cfg.copy(t = 0.5, stepWindows = 16)
    val (cand, _, _, _) = Lsh.candidatePairs(pair.e, pair.i, denseCfg, WindowSec)
    val pairs = cand.collect().map(x => (x.getLong(0), x.getLong(1))).toSet
    val recalled = pair.truth.count { case (u, v) => pairs((u, v)) }
    assert(pair.truth.nonEmpty)
    assert(recalled.toDouble / pair.truth.size >= 0.75,
      s"LSH kept $recalled of ${pair.truth.size} true pairs")
  }

  test("fewer buckets can only add candidates (hash collisions)") {
    val pair = MobilityGen.samplePair(records, n = 12, intersectRatio = 0.5,
      inclusionProb = 0.8)
    val many = Lsh.candidatePairs(pair.e, pair.i, cfg.copy(numBuckets = 1 << 18), WindowSec)
      ._1.count()
    val few = Lsh.candidatePairs(pair.e, pair.i, cfg.copy(numBuckets = 8), WindowSec)
      ._1.count()
    assert(few >= many, s"few=$few many=$many")
  }

  test("lower similarity threshold t can only add candidates") {
    val pair = MobilityGen.samplePair(records, n = 12, intersectRatio = 0.5,
      inclusionProb = 0.8)
    val strict = Lsh.candidatePairs(pair.e, pair.i, cfg.copy(t = 0.9), WindowSec)._1
      .collect().map(r => (r.getLong(0), r.getLong(1))).toSet
    val loose = Lsh.candidatePairs(pair.e, pair.i, cfg.copy(t = 0.2), WindowSec)._1
      .collect().map(r => (r.getLong(0), r.getLong(1))).toSet
    assert(loose.size >= strict.size)
  }
}
