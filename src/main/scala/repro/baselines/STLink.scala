package repro.baselines

import org.apache.spark.sql.{DataFrame, Row, SparkSession}
import org.apache.spark.sql.functions._

import repro.core.{Grid, Histories, Proximity, Tuning}

/** ST-Link baseline (Basık et al., IEEE TMC 2018; paper §5.5, DESIGN S6).
  *
  * Links two entities when they have at least `k` co-occurring records in at
  * least `l` diverse locations and no more than `alibiTolerance` alibi record
  * pairs; any entity that would link ambiguously (to more than one partner)
  * has all its links discarded. `k` and `l` are auto-detected from the
  * distributions of co-occurrence and diversity counts via trade-off (elbow)
  * point detection, as in the original paper.
  *
  * Window comparison is tumbling rather than sliding (DESIGN S6); a
  * co-occurrence is a shared `(window, cell)` bin.
  */
object STLink {

  /** @param level          spatial grid level for co-occurrence cells
    * @param windowSec      comparison window width
    * @param speedKmPerMin  runaway speed for alibi detection
    * @param alibiTolerance alibi record pairs tolerated per entity pair
    *                       (paper §5.5 sets 3)
    * @param k              min co-occurrences; None = auto-detect
    * @param l              min diverse locations; None = auto-detect
    */
  final case class Config(
      level: Int = 14,
      windowSec: Long = 900,
      speedKmPerMin: Double = 2.0,
      alibiTolerance: Int = 3,
      k: Option[Int] = None,
      l: Option[Int] = None,
  )

  /** @param links       final unambiguous links
    * @param scores      co-occurrence score per surviving candidate pair —
    *                    the ranking used for Hit-Precision@k
    * @param kUsed       the k actually applied
    * @param lUsed       the l actually applied
    * @param comparisons window-level record-pair comparisons performed (cost
    *                    metric; ST-Link has no blocking, so this is
    *                    sum_w |E_w| * |I_w| over shared windows)
    * @param elapsedMs   wall time
    */
  final case class Result(
      links: Seq[(Long, Long)],
      scores: Map[(Long, Long), Double],
      kUsed: Int,
      lUsed: Int,
      comparisons: Long,
      elapsedMs: Long,
  )

  /** Elbow-detected threshold over a positive count distribution: sort counts
    * descending and take the value at the curve's knee; degenerate
    * distributions fall back to 2.
    */
  def autoThreshold(counts: Seq[Long]): Int = {
    val sorted = counts.sortBy(-_)
    if (sorted.size < 3 || sorted.distinct.size < 2) 2
    else {
      val idx = Tuning.elbow(sorted.indices.map(_.toDouble), sorted.map(_.toDouble))
      math.max(2, sorted(idx).toInt)
    }
  }

  def run(spark: SparkSession, recordsE: DataFrame, recordsI: DataFrame,
          cfg: Config): Result = {
    val t0 = System.nanoTime()
    val binsE = Histories.build(recordsE, cfg.level, cfg.windowSec)
      .select(col("id").as("uid"), col("win"), col("cell"), col("cnt").as("ucnt")).cache()
    val binsI = Histories.build(recordsI, cfg.level, cfg.windowSec)
      .select(col("id").as("vid"), col("win"), col("cell"), col("cnt").as("vcnt")).cache()

    // Cost metric: all record pairs within each shared window are compared.
    val recE = recordsE.select(col("id"), floor(col("ts") / cfg.windowSec).as("win"))
      .groupBy("win").agg(count(lit(1)).as("ne"))
    val recI = recordsI.select(col("id"), floor(col("ts") / cfg.windowSec).as("win"))
      .groupBy("win").agg(count(lit(1)).as("ni"))
    val comparisons = recE.join(recI, "win")
      .agg(coalesce(sum(col("ne") * col("ni")), lit(0L))).first().getLong(0)

    // Co-occurrences: shared (window, cell) bins.
    val cooc = binsE.join(binsI, Seq("win", "cell"))
      .groupBy("uid", "vid")
      .agg(count(lit(1)).as("cooc"), countDistinct("cell").as("ldiv"))
      .cache()

    val kUsed = cfg.k.getOrElse(
      autoThreshold(cooc.select("cooc").collect().map(_.getLong(0)).toSeq))
    val lUsed = cfg.l.getOrElse(
      autoThreshold(cooc.select("ldiv").collect().map(_.getLong(0)).toSeq))

    val passing = cooc.filter(col("cooc") >= kUsed && col("ldiv") >= lUsed)

    // Alibi check, only for pairs past the (k, l) prefilter: count same-window
    // bin pairs farther apart than the runaway distance.
    val runaway = Proximity.runawayKm(cfg.windowSec, cfg.speedKmPerMin)
    val alibiUdf = udf { (u: Seq[Long], v: Seq[Long]) =>
      var n = 0L
      for (a <- u; b <- v) if (Grid.minDistanceKm(a, b) > runaway) n += 1
      n
    }
    val winE = binsE.groupBy("uid", "win").agg(collect_list("cell").as("ucells"))
    val winI = binsI.groupBy("vid", "win").agg(collect_list("cell").as("vcells"))
    val alibis = passing.select("uid", "vid")
      .join(winE, Seq("uid")).join(winI, Seq("vid", "win"))
      .select(col("uid"), col("vid"), alibiUdf(col("ucells"), col("vcells")).as("na"))
      .groupBy("uid", "vid").agg(sum("na").as("alibis"))

    val survivors = passing.join(alibis, Seq("uid", "vid"), "left")
      .filter(coalesce(col("alibis"), lit(0L)) <= cfg.alibiTolerance)
      .select(col("uid"), col("vid"), col("cooc").cast("double").as("score"))
      .collect()
      .map(r => ((r.getLong(0), r.getLong(1)), r.getDouble(2))).toMap

    // Ambiguity removal: an entity with multiple surviving partners links to none.
    val byU = survivors.keys.groupBy(_._1).view.mapValues(_.size).toMap
    val byV = survivors.keys.groupBy(_._2).view.mapValues(_.size).toMap
    val links = survivors.keys.toSeq
      .filter { case (u, v) => byU(u) == 1 && byV(v) == 1 }
      .sorted

    binsE.unpersist(); binsI.unpersist(); cooc.unpersist()
    Result(links, survivors, kUsed, lUsed, comparisons,
      (System.nanoTime() - t0) / 1000000L)
  }
}
