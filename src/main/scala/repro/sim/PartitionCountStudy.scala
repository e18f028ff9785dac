package repro.sim

import repro.core.frames.JoinRec
import repro.core.hhj.{DynamicHHJ, HHJConfig, HHJStats, PartitionRule, Shapiro}
import repro.core.spill.InMemorySpillStore

/** The §4 simulation study: how the number of partitions drives total
  * spilling (Figures 3 and 4) and the data remaining in memory (Figure 5).
  *
  * Like the paper's simulator, inputs are uniform-key, uniform-size
  * records, and build and probe carry the same amount of data. We run the
  * real Dynamic HHJ engine with metadata-only records, so "spilling" is
  * exact accounting without real I/O.
  */
object PartitionCountStudy {

  final case class Result(
      inputMB: Long,
      partitions: Int,
      totalSpillBytes: Long,
      round1ResidentBytes: Long,
      rounds: Int,
  )

  /** Uniform synthetic input: `n` records of `recSize` bytes with distinct
    * keys drawn from a seeded shuffle-free LCG (uniform spread).
    */
  def uniformInput(totalBytes: Long, recSize: Int, seed: Long): Iterator[JoinRec[Null]] = {
    val n = (totalBytes / recSize).toInt
    Iterator.tabulate(n) { i =>
      // SplittableRandom-style mix keeps keys unique and well-spread.
      val k = scala.util.hashing.byteswap64(i.toLong + seed * 0x632BE59BD9B4E019L)
      JoinRec[Null](k, recSize, null)
    }
  }

  /** One cell of the Figure-3/4/5 sweeps. `fixedAllRounds = true` uses the
    * same partition count in every round (Fig. 3); otherwise later rounds
    * use Equation 2 on the known spilled sizes (Fig. 4).
    */
  def run(
      inputMB: Long,
      memoryMB: Long,
      partitions: Int,
      fixedAllRounds: Boolean,
      frameSize: Int = 32 * 1024,
      recSize: Int = 1024,
      seed: Long = 17,
  ): Result = {
    val memoryFrames = (memoryMB * 1024 * 1024 / frameSize).toInt
    val rule =
      if (fixedAllRounds) PartitionRule.FixedAllRounds(partitions)
      else PartitionRule.Dynamic(firstRound = partitions, laterLowerBound = 2)
    val cfg = HHJConfig(
      memoryFrames = memoryFrames,
      frameSize = frameSize,
      partitionRule = rule,
      // The pure §4 study isolates the partition-count effect, as the paper
      // does: no §8 shortcuts rescue a bad partition count.
      roleReversal = false,
      inMemoryHashJoin = !fixedAllRounds,
      seed = seed,
    )
    val bytes = inputMB * 1024 * 1024
    val store = new InMemorySpillStore[Null]
    val stats: HHJStats =
      DynamicHHJ.join(
        uniformInput(bytes, recSize, seed),
        uniformInput(bytes, recSize, seed),
        cfg,
        store,
        (_: JoinRec[Null], _: JoinRec[Null]) => (),
      )
    store.close()
    Result(inputMB, partitions, stats.io.bytesWritten, stats.round1ResidentBytes, stats.rounds)
  }
}

/** "Ideal spilling": the least build-phase spill possible, computed the way
  * the paper's baseline simulator does — an original HHJ with perfect a
  * priori size information and a fudge factor of 1.4 (§7.1).
  */
object IdealSpill {

  /** Minimum build bytes that must spill given build size and memory. */
  def idealBuildSpillBytes(
      buildBytes: Long,
      memoryFrames: Int,
      frameSize: Int,
      fudge: Double = 1.4,
  ): Long = {
    val capacity = memoryFrames.toLong * frameSize
    if (buildBytes * fudge <= capacity) 0L
    else {
      val buildFrames = math.ceil(buildBytes.toDouble / frameSize).toLong
      val b           = math.max(1L, Shapiro.diskPartitions(buildFrames, memoryFrames.toLong, fudge))
      // One output frame per disk partition; what remains holds the
      // memory-resident partition (shrunk by the fudge factor).
      val residentBytes = math.max(0L, (memoryFrames - b) * frameSize.toLong) / fudge
      math.max(0L, buildBytes - residentBytes.toLong)
    }
  }
}
