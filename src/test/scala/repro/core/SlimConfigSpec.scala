package repro.core

import org.scalatest.funsuite.AnyFunSuite

class SlimConfigSpec extends AnyFunSuite {

  test("defaults mirror the paper's §5.1 settings") {
    val c = Slim.SlimConfig()
    assert(c.windowSec == 900)                 // 15-minute windows
    assert(c.bParam == 0.5)
    assert(c.speedKmPerMin == 2.0)             // US-highway-derived max speed
    assert(c.pairing == Similarity.MnnWithMfn) // MNN + MFN alibi pass
    assert(c.useIdf && c.useNorm)
    assert(c.lsh.isEmpty)                      // brute force unless enabled
  }

  test("scoreConfig derives the runaway distance from window and speed") {
    assert(Slim.SlimConfig().scoreConfig.runawayKm == 30.0)
    assert(Slim.SlimConfig(windowSec = 300).scoreConfig.runawayKm == 10.0)
    assert(Slim.SlimConfig(speedKmPerMin = 1.0).scoreConfig.runawayKm == 15.0)
  }

  test("scoreConfig forwards the ablation flags") {
    val sc = Slim.SlimConfig(pairing = Similarity.AllPairs, useIdf = false,
      useNorm = false, floor = -5.0).scoreConfig
    assert(sc.pairing == Similarity.AllPairs)
    assert(!sc.useIdf && !sc.useNorm)
    assert(sc.floor == -5.0)
  }

  test("LSH defaults follow the paper's §5.3 setup") {
    val l = Lsh.LshConfig()
    assert(l.t == 0.6 && l.numBuckets == 4096)
  }
}
