package repro.bench

import repro.core.frames.JoinRec
import repro.core.growth.GrowthPolicy
import repro.core.hhj.{DynamicHHJ, HHJConfig, HHJStats, PartitionRule, Shapiro}
import repro.core.insertion._
import repro.core.spill.InMemorySpillStore
import repro.core.victim.VictimPolicy
import repro.sim.{IdealSpill, PartitionCountStudy}
import repro.storage.{Device, ResponseTimeModel}
import repro.wisconsin.{KeyDist, RecordSpec, WisconsinGen}

/** The paper's evaluation studies as reusable harnesses. Each function
  * reproduces the data behind one table/figure of the paper; the bench
  * suites (bench/) print and sanity-check them, and the jobs/ entrypoints
  * wrap them for spark-submit. All studies are ratio-preserving scale-downs
  * of the paper's setups (see DESIGN.md §2) and fully deterministic.
  */
object Studies {
  val FrameSize = 32 * 1024

  // ------------------------------------------------------------------
  // Table 1 — Equation 2 partition counts
  // ------------------------------------------------------------------

  /** Paper Table 1: number of partitions by Eq. 2 for M = 128 MB. */
  def table1(): Seq[(Long, Int)] = {
    val memoryFrames = 128L * 1024 * 1024 / FrameSize
    Seq(64L, 128L, 256L, 512L, 1024L, 2048L, 4096L, 8192L).map { buildMB =>
      val buildFrames = buildMB * 1024 * 1024 / FrameSize
      buildMB -> Shapiro.table1Partitions(buildFrames, memoryFrames)
    }
  }

  // ------------------------------------------------------------------
  // Figures 3-5 — number-of-partitions simulation study
  // ------------------------------------------------------------------

  final case class SweepCell(inputMB: Long, partitions: Int, spilledMB: Double, residentMB: Double, rounds: Int)

  /** The §4 sweep. One run yields both the Figure-3/4 metric (total spilled
    * MB across all rounds, build + probe) and the Figure-5 metric (build
    * data resident at the end of round 1).
    *
    * Scaled from the paper's M = 128 MB to `memoryMB` with identical
    * data/memory ratios (1x .. 64x).
    */
  def partitionSweep(
      memoryMB: Long,
      inputsMB: Seq[Long],
      partitionCounts: Seq[Int],
      fixedAllRounds: Boolean,
  ): Seq[SweepCell] =
    for {
      inputMB <- inputsMB
      p       <- partitionCounts
      if p < (memoryMB * 1024 * 1024 / FrameSize) // every partition needs a frame
    } yield {
      val r = PartitionCountStudy.run(inputMB, memoryMB, p, fixedAllRounds, FrameSize)
      SweepCell(inputMB, p, r.totalSpillBytes / 1048576.0, r.round1ResidentBytes / 1048576.0, r.rounds)
    }

  // ------------------------------------------------------------------
  // Figures 6-11 — partition insertion studies
  // ------------------------------------------------------------------

  final case class InsertionRow(
      policy: String,
      largePct: Int,
      frameFullness: Double,
      framesSearched: Long,
      rngCalls: Long,
      secondsHDD: Double,
      secondsSSD: Double,
      secondsEBS: Double,
  )

  /** One no-spill join measuring an insertion policy's frame fullness, its
    * search effort, and the modeled response time per storage device
    * (Figures 6-11). Build and probe are `dataMB` each.
    */
  def insertionStudy(
      policies: Seq[(String, () => InsertionPolicy)],
      spec: RecordSpec,
      // Large enough that 10% of a partition's frames exceeds Append's 8
      // (the paper's 1 GB runs have ~1600 frames per partition; 128 MB over
      // 20 partitions keeps the same ordering of search budgets).
      dataMB: Int = 128,
      seed: Long = 101,
  ): Seq[InsertionRow] = {
    val dataBytes  = dataMB.toLong * 1024 * 1024
    val (n, mk)    = WisconsinGen.dataset(dataBytes, spec, KeyDist.Unique, seed)
    val inputBytes = 2 * dataBytes
    // Enough memory that nothing spills: frames for data at worst-case
    // fullness (one large record per frame) plus slack.
    val memoryFrames = math.max(64, (dataBytes / FrameSize * 4).toInt)
    policies.map { case (name, ins) =>
      val cfg = HHJConfig(
        memoryFrames = memoryFrames,
        frameSize = FrameSize,
        partitionRule = PartitionRule.Dynamic(20, 20),
        insertion = ins,
        seed = seed,
      )
      val store = new InMemorySpillStore[Null]
      val stats =
        DynamicHHJ.join(mk(), WisconsinGen.records(n, spec, KeyDist.Unique, seed + 1), cfg, store,
          (_: JoinRec[Null], _: JoinRec[Null]) => ())
      store.close()
      require(stats.io.bytesWritten == 0, s"insertion study must not spill ($name)")
      InsertionRow(
        name,
        (spec.largeRatio * 100).round.toInt,
        stats.round1AvgFullness,
        stats.search.framesSearched,
        stats.search.rngCalls,
        ResponseTimeModel.seconds(stats, inputBytes, Device.HDD),
        ResponseTimeModel.seconds(stats, inputBytes, Device.SSD),
        ResponseTimeModel.seconds(stats, inputBytes, Device.EBS),
      )
    }
  }

  /** The six §5 policies at their paper-chosen parameters. */
  def standardInsertionPolicies(seed: Long = 7): Seq[(String, () => InsertionPolicy)] = Seq(
    "Append(8)"      -> (() => Append(8)),
    "First-Fit"      -> (() => FirstFit),
    "First-Fit(10%)" -> (() => FirstFitPct(0.10)),
    "Best-Fit"       -> (() => BestFit),
    "Next-Fit"       -> (() => new NextFit),
    "Random(10%)"    -> (() => new RandomPct(0.10, seed)),
  )

  /** Figures 6-8: the parameter sweeps that justify Append(8),
    * First-Fit(10%), Random(10%).
    */
  def parameterChoiceStudy(largeRatio: Double, dataMB: Int = 16): Seq[InsertionRow] = {
    val appendParams   = Seq(1, 2, 4, 6, 8, 9, 10).map(k => s"Append($k)" -> (() => Append(k): InsertionPolicy))
    val firstFitParams = Seq(0.05, 0.10, 0.25, 0.50, 1.0).map(p =>
      f"First-Fit(${(p * 100).round}%%)" -> (() => FirstFitPct(p): InsertionPolicy))
    val randomParams = Seq(0.05, 0.10, 0.25, 0.50, 1.0).map(p =>
      f"Random(${(p * 100).round}%%)" -> (() => new RandomPct(p, 7): InsertionPolicy))
    insertionStudy(appendParams ++ firstFitParams ++ randomParams, RecordSpec.oneLarge(largeRatio), dataMB)
  }

  // ------------------------------------------------------------------
  // Figure 12 — growth policies for spilled partitions
  // ------------------------------------------------------------------

  final case class GrowthRow(
      policy: String,
      dataMemRatio: Double,
      writtenMB: Double,
      seqWriteOps: Long,
      seqWriteFrames: Long,
      randWriteOps: Long,
      secondsCached: Double,
      secondsDirect: Double,
  )

  /** §6.2's experiment, ratio-preserving: memory `memoryFrames` frames, All
    * Small records, data/memory ratios as in the paper (1.2x .. 100x),
    * writes priced on HDD with the filesystem cache on (a,b,c,d) and off
    * (e,f,g,h).
    */
  def growthStudy(
      ratios: Seq[Double] = Seq(1.2, 2, 10, 20, 100),
      memoryFrames: Int = 500,
      seed: Long = 301,
  ): Seq[GrowthRow] = {
    val memBytes = memoryFrames.toLong * FrameSize
    for {
      ratio  <- ratios
      policy <- Seq(GrowthPolicy.NGNS, GrowthPolicy.GS)
    } yield {
      val dataBytes = (memBytes * ratio).toLong
      val (n, mk)   = WisconsinGen.dataset(dataBytes, RecordSpec.AllSmall, KeyDist.Unique, seed)
      val cfg = HHJConfig(
        memoryFrames = memoryFrames,
        frameSize = FrameSize,
        partitionRule = PartitionRule.Dynamic(20, 20),
        growth = policy,
        seed = seed,
      )
      val store = new InMemorySpillStore[Null]
      val stats = DynamicHHJ.join(mk(), WisconsinGen.records(n, RecordSpec.AllSmall, KeyDist.Unique, seed + 1),
        cfg, store, (_: JoinRec[Null], _: JoinRec[Null]) => ())
      store.close()
      // Write-pattern counters are build-phase only, matching the paper's
      // Figure-12 scope; response times cover the whole query.
      GrowthRow(
        policy.name,
        ratio,
        stats.buildIo.bytesWritten / 1048576.0,
        stats.buildIo.seqWriteOps,
        stats.buildIo.seqWriteFrames,
        stats.buildIo.randWriteOps,
        ResponseTimeModel.seconds(stats, 2 * dataBytes, Device.HDD, fsCache = true),
        ResponseTimeModel.seconds(stats, 2 * dataBytes, Device.HDD, fsCache = false),
      )
    }
  }

  // ------------------------------------------------------------------
  // Figures 13-17 — victim selection studies
  // ------------------------------------------------------------------

  final case class VictimRow(
      policy: String,
      dataMemRatio: Double,
      spilledRatio: Double,
      spilledPartitions: Int,
      seqWriteFrames: Long,
      randWriteOps: Long,
  )

  /** One victim-selection experiment: 13 policies x data/memory ratios.
    * The metric is the paper's: round-1 build-phase spilled bytes over the
    * ideal spill of an exactly-informed HHJ (fudge 1.4). NG-NS growth, as
    * in §7.
    *
    * @param buildKeys  key distribution of the build side (probe side is
    *                   always unique, §7.1.1)
    */
  def victimStudy(
      spec: RecordSpec,
      buildKeys: KeyDist,
      ratios: Seq[Double] = Seq(1.2, 1.5, 2, 3, 4, 6, 8),
      memoryFrames: Int = 512,
      seed: Long = 401,
  ): Seq[VictimRow] = {
    val memBytes = memoryFrames.toLong * FrameSize
    for {
      ratio <- ratios
      mkVictim <- VictimPolicy.all13(seed)
    } yield {
      val dataBytes = (memBytes * ratio).toLong
      val (_, mkB)  = WisconsinGen.dataset(dataBytes, spec, buildKeys, seed)
      val cfg = HHJConfig(
        memoryFrames = memoryFrames,
        frameSize = FrameSize,
        partitionRule = PartitionRule.Dynamic(20, 20),
        victim = mkVictim,
        growth = GrowthPolicy.NGNS,
        seed = seed,
      )
      val store = new InMemorySpillStore[Null]
      // The metric is round-1 build-phase spill; an empty probe skips the
      // probe pass and recursion, which this study does not measure.
      val stats = DynamicHHJ.join(mkB(), Iterator.empty[JoinRec[Null]],
        cfg, store, (_: JoinRec[Null], _: JoinRec[Null]) => ())
      store.close()
      val actual = stats.round1BuildSpillBytes
      // The paper's denominator runs at fudge 1.4 because AsterixDB pays
      // hash-table overhead; this engine does not model that overhead, so
      // the equivalent "minimum possible spill" here uses fudge 1.0
      // (see DESIGN.md). Ratios stay >= ~1 as in the paper's figures.
      val ideal = IdealSpill.idealBuildSpillBytes(dataBytes, memoryFrames, FrameSize, fudge = 1.0)
      VictimRow(
        mkVictim().name,
        ratio,
        if (ideal == 0) Double.NaN else actual.toDouble / ideal,
        stats.round1SpilledPartitions,
        stats.io.seqWriteFrames,
        stats.io.randWriteOps,
      )
    }
  }

  // ------------------------------------------------------------------
  // Formatting
  // ------------------------------------------------------------------

  /** Render rows as an aligned text table. */
  def fmt(headers: Seq[String], rows: Seq[Seq[Any]]): String = {
    def cell(a: Any): String = a match {
      case d: Double if d.isNaN => "-"
      case d: Double            => f"$d%.3f"
      case x                    => x.toString
    }
    val all    = headers +: rows.map(_.map(cell))
    val widths = all.transpose.map(_.map(_.length).max)
    all
      .map(r => r.zip(widths).map { case (c, w) => c.padTo(w, ' ') }.mkString("  "))
      .mkString("\n")
  }
}
