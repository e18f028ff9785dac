package repro.core

import scala.collection.mutable.ArrayBuffer

import org.scalatest.funsuite.AnyFunSuite

import repro.core.frames.JoinRec
import repro.core.growth.GrowthPolicy
import repro.core.hhj.{DynamicHHJ, HHJConfig, HHJStats, PartitionRule}
import repro.core.insertion._
import repro.core.spill.InMemorySpillStore
import repro.core.victim._

class DynamicHHJSpec extends AnyFunSuite {

  private def runJoin(
      build: Seq[JoinRec[Integer]],
      probe: Seq[JoinRec[Integer]],
      cfg: HHJConfig,
  ): (Set[(Int, Int)], HHJStats) = {
    val store = new InMemorySpillStore[Integer]
    val out   = Set.newBuilder[(Int, Int)]
    val stats = DynamicHHJ.join(
      build.iterator,
      probe.iterator,
      cfg,
      store,
      (b: JoinRec[Integer], p: JoinRec[Integer]) => out += ((b.payload.intValue, p.payload.intValue)),
    )
    store.close()
    (out.result(), stats)
  }

  private def baseCfg(memoryFrames: Int = 24, frameSize: Int = 1024, partitions: Int = 4) =
    HHJConfig(
      memoryFrames = memoryFrames,
      frameSize = frameSize,
      partitionRule = PartitionRule.Dynamic(firstRound = partitions, laterLowerBound = 2),
    )

  // ---------------- Correctness: result equivalence ----------------

  test("join with ample memory produces exactly the naive result") {
    val b = TestData.records(500, keySpace = 200, 20, 80, seed = 1)
    val p = TestData.records(800, keySpace = 200, 20, 80, seed = 2, idBase = 100000)
    val (got, stats) = runJoin(b, p, baseCfg(memoryFrames = 256))
    assert(got == TestData.naiveJoin(b, p))
    assert(stats.io.bytesWritten == 0, "nothing should spill with ample memory")
    assert(stats.rounds == 1)
  }

  test("join under heavy memory pressure still produces the naive result") {
    val b = TestData.records(2000, keySpace = 500, 20, 80, seed = 3)
    val p = TestData.records(3000, keySpace = 500, 20, 80, seed = 4, idBase = 100000)
    val (got, stats) = runJoin(b, p, baseCfg(memoryFrames = 12, partitions = 4))
    assert(got == TestData.naiveJoin(b, p))
    assert(stats.io.bytesWritten > 0, "this configuration must spill")
  }

  test("multi-round recursion (memory far smaller than input) is correct") {
    val b = TestData.records(6000, keySpace = 1500, 30, 60, seed = 5)
    val p = TestData.records(6000, keySpace = 1500, 30, 60, seed = 6, idBase = 100000)
    val (got, stats) = runJoin(b, p, baseCfg(memoryFrames = 8, partitions = 3))
    assert(got == TestData.naiveJoin(b, p))
    assert(stats.maxDepthReached >= 1, "expected recursive rounds")
  }

  test("empty build input yields an empty result") {
    val p = TestData.records(100, 50, 20, 40, seed = 7)
    val (got, _) = runJoin(Vector.empty, p, baseCfg())
    assert(got.isEmpty)
  }

  test("empty probe input yields an empty result") {
    val b = TestData.records(100, 50, 20, 40, seed = 8)
    val (got, _) = runJoin(b, Vector.empty, baseCfg())
    assert(got.isEmpty)
  }

  test("disjoint key ranges produce no matches but still terminate under pressure") {
    val b = TestData.records(1000, 300, 30, 60, seed = 9).map(r => r.copy(key = r.key))
    val p = TestData.records(1000, 300, 30, 60, seed = 10, idBase = 5000).map(r => r.copy(key = r.key + 1000))
    val (got, _) = runJoin(b, p, baseCfg(memoryFrames = 10))
    assert(got.isEmpty)
  }

  test("duplicate-heavy keys (cross-product per key) are correct") {
    val b = TestData.records(300, keySpace = 10, 20, 40, seed = 11)
    val p = TestData.records(300, keySpace = 10, 20, 40, seed = 12, idBase = 9000)
    val (got, _) = runJoin(b, p, baseCfg(memoryFrames = 64))
    assert(got == TestData.naiveJoin(b, p))
    assert(got.size > 300 * 5, "cross products expected")
  }

  test("variable record sizes near the frame size are correct under pressure") {
    val b = TestData.records(400, 150, 100, 1000, seed = 13)
    val p = TestData.records(400, 150, 100, 1000, seed = 14, idBase = 7000)
    val (got, _) = runJoin(b, p, baseCfg(memoryFrames = 10, frameSize = 1024))
    assert(got == TestData.naiveJoin(b, p))
  }

  test("a record exactly the frame size is accepted; larger is rejected") {
    val cfg = baseCfg(frameSize = 256)
    val ok  = Vector(JoinRec[Integer](1L, 256, Int.box(1)))
    val (got, _) = runJoin(ok, Vector(JoinRec[Integer](1L, 256, Int.box(2))), cfg)
    assert(got == Set((1, 2)))
    intercept[IllegalArgumentException] {
      runJoin(Vector(JoinRec[Integer](1L, 257, Int.box(1))), Vector.empty, cfg)
    }
  }

  // ---------------- Policy matrix ----------------

  private val insertions: Seq[(String, () => InsertionPolicy)] = Seq(
    "Append(8)"      -> (() => Append(8)),
    "First-Fit"      -> (() => FirstFit),
    "First-Fit(10%)" -> (() => FirstFitPct(0.10)),
    "Best-Fit"       -> (() => BestFit),
    "Next-Fit"       -> (() => new NextFit),
    "Random(10%)"    -> (() => new RandomPct(0.10, 21)),
  )

  for ((name, ins) <- insertions)
    test(s"insertion policy $name preserves join correctness under spilling") {
      val b = TestData.records(1500, 400, 30, 200, seed = 15)
      val p = TestData.records(1500, 400, 30, 200, seed = 16, idBase = 40000)
      val (got, _) = runJoin(b, p, baseCfg(memoryFrames = 12).copy(insertion = ins))
      assert(got == TestData.naiveJoin(b, p))
    }

  for (mk <- VictimPolicy.all13(seed = 31)) {
    val name = mk().name
    test(s"victim policy $name preserves join correctness under spilling") {
      val b = TestData.records(1500, 400, 30, 200, seed = 17)
      val p = TestData.records(1500, 400, 30, 200, seed = 18, idBase = 40000)
      val (got, _) = runJoin(b, p, baseCfg(memoryFrames = 12).copy(victim = mk))
      assert(got == TestData.naiveJoin(b, p))
    }
  }

  for (g <- Seq(GrowthPolicy.NGNS, GrowthPolicy.GS))
    test(s"growth policy ${g.name} preserves join correctness under spilling") {
      val b = TestData.records(2000, 600, 30, 120, seed = 19)
      val p = TestData.records(2500, 600, 30, 120, seed = 20, idBase = 50000)
      val (got, _) = runJoin(b, p, baseCfg(memoryFrames = 12).copy(growth = g))
      assert(got == TestData.naiveJoin(b, p))
    }

  test("skewed build input joins correctly under every growth policy") {
    val b = TestData.skewed(2000, 300, hotShare = 0.6, 30, 120, seed = 21)
    val p = TestData.records(1000, 300, 30, 120, seed = 22, idBase = 60000)
    for (g <- Seq(GrowthPolicy.NGNS, GrowthPolicy.GS)) {
      val (got, _) = runJoin(b, p, baseCfg(memoryFrames = 10).copy(growth = g))
      assert(got == TestData.naiveJoin(b, p), g.name)
    }
  }

  // ---------------- Growth-policy I/O pattern invariants (§6) ----------------

  test("NG-NS never performs multi-frame writes after a partition's first spill beyond drain") {
    val b = TestData.records(4000, 1200, 30, 60, seed = 23)
    val p = TestData.records(4000, 1200, 30, 60, seed = 24, idBase = 80000)
    val (_, ngns) = runJoin(b, p, baseCfg(memoryFrames = 12).copy(growth = GrowthPolicy.NGNS))
    val (_, gs)   = runJoin(b, p, baseCfg(memoryFrames = 12).copy(growth = GrowthPolicy.GS))
    assert(ngns.io.randWriteOps > gs.io.randWriteOps, "NG-NS must do more random writes")
    assert(gs.io.seqWriteFrames > ngns.io.seqWriteFrames, "G-S must write more frames sequentially")
  }

  test("NG-NS and G-S write similar total volume (analytical claim of §6.1)") {
    val b = TestData.records(4000, 1200, 30, 60, seed = 23)
    val p = TestData.records(4000, 1200, 30, 60, seed = 24, idBase = 80000)
    val (r1, ngns) = runJoin(b, p, baseCfg(memoryFrames = 12).copy(growth = GrowthPolicy.NGNS))
    val (r2, gs)   = runJoin(b, p, baseCfg(memoryFrames = 12).copy(growth = GrowthPolicy.GS))
    assert(r1 == r2)
    val ratio = ngns.io.bytesWritten.toDouble / gs.io.bytesWritten
    assert(ratio > 0.7 && ratio < 1.4, s"volumes should be comparable, ratio=$ratio")
  }

  // ---------------- §8 optimizations ----------------

  test("§8.1 bail-out: a single hot key triggers BNLJ instead of endless recursion") {
    val hotB = Vector.tabulate(3000)(i => JoinRec[Integer](42L, 50, Int.box(i)))
    val hotP = Vector.tabulate(1000)(i => JoinRec[Integer](42L, 50, Int.box(100000 + i)))
    val (got, stats) = runJoin(hotB, hotP, baseCfg(memoryFrames = 8, partitions = 3))
    assert(got.size == 3000 * 1000)
    assert(stats.bnljRounds > 0, "bail-out to BNLJ expected")
    assert(stats.maxDepthReached < 6, "recursion should stop early")
  }

  test("§8.2 role reversal: build side larger than probe side gets swapped in later rounds") {
    val big   = TestData.records(4000, 900, 30, 60, seed = 25)
    val small = TestData.records(800, 900, 30, 60, seed = 26, idBase = 90000)
    // Present the BIG side as build; reversal should kick in for spilled pairs.
    val (got, stats) = runJoin(big, small, baseCfg(memoryFrames = 10))
    assert(got == TestData.naiveJoin(big, small))
    assert(stats.roleReversals > 0)
  }

  test("§8.2 disabled: no reversals happen") {
    val big   = TestData.records(4000, 900, 30, 60, seed = 25)
    val small = TestData.records(800, 900, 30, 60, seed = 26, idBase = 90000)
    val (got, stats) = runJoin(big, small, baseCfg(memoryFrames = 10).copy(roleReversal = false))
    assert(got == TestData.naiveJoin(big, small))
    assert(stats.roleReversals == 0)
  }

  test("§8.3 in-memory hash join resolves small spilled pairs without partitioning") {
    val b = TestData.records(3000, 800, 30, 60, seed = 27)
    val p = TestData.records(3000, 800, 30, 60, seed = 28, idBase = 90000)
    val (got, stats) = runJoin(b, p, baseCfg(memoryFrames = 16))
    assert(got == TestData.naiveJoin(b, p))
    assert(stats.inMemoryRounds > 0, "spilled partitions should fit in memory next round")
  }

  test("§8.3 disabled: later rounds run the partitioned path") {
    val b = TestData.records(3000, 800, 30, 60, seed = 27)
    val p = TestData.records(3000, 800, 30, 60, seed = 28, idBase = 90000)
    val (got, stats) = runJoin(b, p, baseCfg(memoryFrames = 16).copy(inMemoryHashJoin = false))
    assert(got == TestData.naiveJoin(b, p))
    assert(stats.inMemoryRounds == 0)
    assert(stats.rounds > 1)
  }

  test("§8.5 reload: a spilled partition fitting in leftover memory is brought back") {
    // Crafted stream: partition A (30 frames) spills first when C grows;
    // later C itself (34 frames) spills, leaving ~34 free frames at the end
    // of the build — room to reload A but not C.
    import repro.core.frames.SplitFun
    val seed = 42L // cfg.seed + depth 0
    def keyFor(target: Int): Long =
      Iterator.iterate(1L)(_ + 1).find(k => SplitFun.partition(k, seed, 4) == target).get
    val (ka, kb, kc) = (keyFor(0), keyFor(1), keyFor(2))
    var id = 0
    def recs(key: Long, n: Int): Vector[JoinRec[Integer]] =
      Vector.fill(n) { id += 1; JoinRec[Integer](key, 1000, Int.box(id)) }
    val build = recs(ka, 30) ++ recs(kb, 25) ++ recs(kc, 40)
    val probe = recs(ka, 10) ++ recs(kb, 10) ++ recs(kc, 10)
    val cfg = HHJConfig(
      memoryFrames = 60, frameSize = 1024,
      partitionRule = PartitionRule.Dynamic(firstRound = 4, laterLowerBound = 2),
      reloadSpilled = true,
    )
    val (got, stats) = runJoin(build, probe, cfg)
    assert(got == TestData.naiveJoin(build, probe))
    assert(stats.round1SpilledPartitions >= 2, "A and C should spill during the build")
    assert(stats.reloadedPartitions == 1, "exactly partition A should be reloaded")
  }

  test("§8.5 reload preserves correctness on random workloads") {
    val b = TestData.records(1200, 400, 30, 60, seed = 29)
    val p = TestData.records(1200, 400, 30, 60, seed = 30, idBase = 95000)
    val cfgOn  = baseCfg(memoryFrames = 40, partitions = 8).copy(reloadSpilled = true)
    val cfgOff = baseCfg(memoryFrames = 40, partitions = 8).copy(reloadSpilled = false)
    val (gotOn, _)  = runJoin(b, p, cfgOn)
    val (gotOff, _) = runJoin(b, p, cfgOff)
    assert(gotOn == gotOff && gotOn == TestData.naiveJoin(b, p))
  }

  test("§8.4 Best-Match victim policy is correct when sizes are known") {
    val b = TestData.records(3000, 700, 30, 90, seed = 31)
    val p = TestData.records(3000, 700, 30, 90, seed = 32, idBase = 97000)
    val (got, _) = runJoin(b, p, baseCfg(memoryFrames = 10).copy(victim = () => BestMatch))
    assert(got == TestData.naiveJoin(b, p))
  }

  // ---------------- Statistics plausibility ----------------

  test("statistics account every processed record") {
    val b = TestData.records(1000, 300, 30, 60, seed = 33)
    val p = TestData.records(1100, 300, 30, 60, seed = 34, idBase = 98000)
    val (_, stats) = runJoin(b, p, baseCfg(memoryFrames = 256))
    assert(stats.buildRecordsProcessed == 1000)
    assert(stats.probeRecordsProcessed == 1100)
    assert(stats.round1Partitions == 4)
  }

  test("round-1 metrics: resident bytes plus spilled bytes cover the build input") {
    val b = TestData.records(3000, 900, 30, 60, seed = 35)
    val p = TestData.records(3000, 900, 30, 60, seed = 36, idBase = 99000)
    val (_, stats) = runJoin(b, p, baseCfg(memoryFrames = 12))
    val buildBytes = b.map(_.size.toLong).sum
    assert(stats.round1ResidentBytes + stats.round1BuildSpillBytes >= buildBytes)
    assert(stats.round1ResidentBytes < buildBytes)
  }

  test("round-1 average frame fullness lies in (0, 1]") {
    val b = TestData.records(500, 200, 30, 60, seed = 37)
    val p = TestData.records(500, 200, 30, 60, seed = 38, idBase = 99500)
    val (_, stats) = runJoin(b, p, baseCfg(memoryFrames = 64))
    assert(stats.round1AvgFullness > 0 && stats.round1AvgFullness <= 1.0)
  }

  test("no spilling means zero bytes written and one round") {
    val b = TestData.records(200, 100, 30, 60, seed = 39)
    val p = TestData.records(200, 100, 30, 60, seed = 40, idBase = 99700)
    val (_, stats) = runJoin(b, p, baseCfg(memoryFrames = 128))
    assert(stats.io.bytesWritten == 0 && stats.rounds == 1 && stats.victimSpills == 0)
  }

  test("determinism: identical runs yield identical stats and results") {
    val b = TestData.records(2000, 500, 30, 120, seed = 41)
    val p = TestData.records(2000, 500, 30, 120, seed = 42, idBase = 99800)
    val cfg = baseCfg(memoryFrames = 12)
    val (r1, s1) = runJoin(b, p, cfg)
    val (r2, s2) = runJoin(b, p, cfg)
    assert(r1 == r2)
    assert(s1.io.bytesWritten == s2.io.bytesWritten)
    assert(s1.victimSpills == s2.victimSpills)
    assert(s1.rounds == s2.rounds)
  }

  test("the emit callback sees every pair exactly once (no duplicates)") {
    val b = TestData.records(800, 200, 30, 60, seed = 43)
    val p = TestData.records(800, 200, 30, 60, seed = 44, idBase = 99900)
    val pairs = ArrayBuffer.empty[(Int, Int)]
    val store = new InMemorySpillStore[Integer]
    DynamicHHJ.join(
      b.iterator, p.iterator, baseCfg(memoryFrames = 10), store,
      (x: JoinRec[Integer], y: JoinRec[Integer]) => pairs += ((x.payload.intValue, y.payload.intValue)),
    )
    store.close()
    assert(pairs.size == pairs.distinct.size, "duplicate emissions detected")
    assert(pairs.toSet == TestData.naiveJoin(b, p))
  }
}
