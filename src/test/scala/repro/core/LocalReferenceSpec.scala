package repro.core

import org.scalatest.funsuite.AnyFunSuite

/** Direct unit tests of the in-core reference dataset construction — the
  * independent implementation the Spark pipeline is cross-checked against.
  */
class LocalReferenceSpec extends AnyFunSuite {

  private val Level = 12
  private val Win = 900L

  // Two entities in the same cell at window 0; entity 1 alone at window 2.
  private val rows = Seq(
    (1L, 10L, 37.77, -122.42),
    (1L, 20L, 37.77, -122.42),   // duplicate bin, higher count
    (2L, 100L, 37.77, -122.42),
    (1L, 1810L, 40.71, -74.01))
  private lazy val ds = LocalReference.Dataset.fromRecords(rows, Level, Win)

  test("histories: counts per (id, win, cell)") {
    val c0 = Grid.cellOf(37.77, -122.42, Level)
    val cNy = Grid.cellOf(40.71, -74.01, Level)
    assert(ds.histories(1L)(0L)(c0) == 2)
    assert(ds.histories(2L)(0L)(c0) == 1)
    assert(ds.histories(1L)(2L)(cNy) == 1)
    assert(!ds.histories(2L).contains(2L))
  }

  test("idf: shared bin gets ln(2/2)=0, unique bin ln(2/1)") {
    val c0 = Grid.cellOf(37.77, -122.42, Level)
    val cNy = Grid.cellOf(40.71, -74.01, Level)
    assert(math.abs(ds.idf((0L, c0)) - 0.0) < 1e-12)
    assert(math.abs(ds.idf((2L, cNy)) - math.log(2.0)) < 1e-12)
  }

  test("length norm: BM25 form over bin counts") {
    // |H_1| = 2 bins, |H_2| = 1 bin, avg = 1.5
    assert(math.abs(ds.lnorm(1L) - (0.5 + 0.5 * 2 / 1.5)) < 1e-12)
    assert(math.abs(ds.lnorm(2L) - (0.5 + 0.5 * 1 / 1.5)) < 1e-12)
  }

  test("score: identical singleton histories, no idf/norm, equals 1") {
    val a = LocalReference.Dataset.fromRecords(
      Seq((1L, 10L, 37.77, -122.42)), Level, Win)
    val b = LocalReference.Dataset.fromRecords(
      Seq((2L, 20L, 37.77, -122.42)), Level, Win)
    val cfg = Similarity.ScoreConfig(runawayKm = 30.0, useIdf = false, useNorm = false)
    assert(math.abs(LocalReference.score(a, b, 1L, 2L, cfg) - 1.0) < 1e-12)
  }

  test("score: disjoint windows give exactly zero") {
    val a = LocalReference.Dataset.fromRecords(Seq((1L, 10L, 37.77, -122.42)), Level, Win)
    val b = LocalReference.Dataset.fromRecords(Seq((2L, 5000L, 37.77, -122.42)), Level, Win)
    val cfg = Similarity.ScoreConfig(runawayKm = 30.0)
    assert(LocalReference.score(a, b, 1L, 2L, cfg) == 0.0)
  }

  test("score: same-window cross-country pair is negative (alibi)") {
    val a = LocalReference.Dataset.fromRecords(Seq((1L, 10L, 37.77, -122.42)), Level, Win)
    val b = LocalReference.Dataset.fromRecords(Seq((2L, 20L, 40.71, -74.01)), Level, Win)
    val cfg = Similarity.ScoreConfig(runawayKm = 30.0, useIdf = false)
    assert(LocalReference.score(a, b, 1L, 2L, cfg) < 0)
  }

  test("unknown entity scores zero against anything") {
    val cfg = Similarity.ScoreConfig(runawayKm = 30.0)
    assert(LocalReference.score(ds, ds, 99L, 1L, cfg) == 0.0)
  }
}
