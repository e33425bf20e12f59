package repro.core

import org.apache.spark.ml.feature.MinHashLSH
import org.apache.spark.ml.linalg.Vectors
import org.apache.spark.sql.{DataFrame, Row}
import org.apache.spark.sql.functions._

import scala.util.hashing.MurmurHash3

/** Candidate generation via Spark ML's `MinHashLSH` transformer — an
  * alternative to the paper's banding scheme ([[Lsh]]).
  *
  * Each mobility history becomes the *set* of its (query-window, dominating
  * cell) tokens; MinHash approximates the Jaccard similarity of these token
  * sets, and `approxSimilarityJoin` emits pairs with Jaccard >= `t`. Note the
  * semantics differ slightly from the paper's measure (#matching positions /
  * signature length, i.e. containment in the fixed query grid vs Jaccard over
  * present tokens); benches compare both generators' recall of true pairs.
  */
object MinHashCandidates {

  /** Token-hash vector dimensionality. */
  val Dim: Int = 1 << 20

  /** Sparse binary token vectors per entity: `(id, features)`. Entities whose
    * signature is all placeholders (no tokens) are dropped — MinHash requires
    * at least one set bit, and such entities cannot be LSH-matched anyway.
    */
  def tokenVectors(sig: DataFrame): DataFrame = {
    val toVec = udf { (entries: Seq[Row]) =>
      val idx = entries
        .map(e => math.floorMod(MurmurHash3.productHash((e.getLong(0), e.getLong(1))), Dim))
        .distinct.sorted.toArray
      Vectors.sparse(Dim, idx, Array.fill(idx.length)(1.0))
    }
    sig.groupBy("id")
      .agg(collect_list(struct(col("qidx"), col("cell"))).as("tokens"))
      .select(col("id"), toVec(col("tokens")).as("features"))
  }

  /** Candidate `(uid, vid)` pairs with approximate Jaccard >= `t`. */
  def candidates(sigE: DataFrame, sigI: DataFrame, t: Double,
                 numHashTables: Int = 8, seed: Long = 7): DataFrame = {
    require(t > 0 && t <= 1)
    val vecE = tokenVectors(sigE)
    val vecI = tokenVectors(sigI)
    val model = new MinHashLSH()
      .setNumHashTables(numHashTables)
      .setInputCol("features")
      .setOutputCol("hashes")
      .setSeed(seed)
      .fit(vecE)
    model.approxSimilarityJoin(vecE, vecI, 1.0 - t, "jaccardDist")
      .select(col("datasetA.id").as("uid"), col("datasetB.id").as("vid"))
      .distinct()
  }

  /** Full generation from records, mirroring [[Lsh.candidatePairs]]. */
  def candidatePairs(recordsE: DataFrame, recordsI: DataFrame, cfg: Lsh.LshConfig,
                     windowSec: Long, numHashTables: Int = 8): DataFrame = {
    val sigE = Lsh.signatures(recordsE, cfg, windowSec)
    val sigI = Lsh.signatures(recordsI, cfg, windowSec)
    candidates(sigE, sigI, cfg.t, numHashTables)
  }
}
