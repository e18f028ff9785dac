package repro.core.hhj

import repro.core.growth.GrowthPolicy
import repro.core.insertion.{Append, InsertionPolicy}
import repro.core.victim.{LargestSize, VictimPolicy}

/** How many partitions each round of the join uses (§4). */
sealed trait PartitionRule {
  /** Partition count for round 1, where input sizes are unknown. */
  def firstRound: Int
}

object PartitionRule {

  /** The same fixed partition count in every round — the Figure-3 setting. */
  final case class FixedAllRounds(p: Int) extends PartitionRule {
    require(p >= 2)
    def firstRound: Int = p
  }

  /** Fixed count for round 1 (sizes unknown); later rounds use Equation 2
    * on the now-known spilled-partition sizes, clamped below by
    * `laterLowerBound`. The paper's recommendation is
    * `Dynamic(20, laterLowerBound = 20)` (the default config); Figure 4 uses
    * `Dynamic(p, laterLowerBound = 2)`.
    */
  final case class Dynamic(firstRound: Int = 20, laterLowerBound: Int = 20) extends PartitionRule {
    require(firstRound >= 2 && laterLowerBound >= 2)
  }

  def forRound(rule: PartitionRule, buildBytes: Long, memoryFrames: Int, frameSize: Int, fudge: Double): Int =
    rule match {
      case FixedAllRounds(p) => math.min(p, memoryFrames - 1)
      case Dynamic(_, lb) =>
        val buildFrames = math.max(1L, math.ceil(buildBytes.toDouble / frameSize).toLong)
        Shapiro.roundPartitions(buildFrames, memoryFrames.toLong, fudge, lb)
    }
}

/** Full configuration of the Dynamic HHJ operator.
  *
  * @param memoryFrames  join memory budget in frames (|M| of the paper)
  * @param frameSize     frame capacity in bytes (AsterixDB default 32 KB)
  * @param partitionRule number-of-partitions policy (§4)
  * @param insertion     partition insertion policy factory (§5; fresh
  *                      instance per round — some policies are stateful)
  * @param victim        victim selection policy factory (§7)
  * @param growth        spilled-partition growth policy (§6)
  * @param eq2Fudge      fudge factor for Equation-2 partition counts
  *                      (Table 1 implies 1.3)
  * @param roleReversal  §8.2: later rounds build on the smaller input
  * @param inMemoryHashJoin §8.3: later rounds whose build fits in memory
  *                      skip partitioning entirely
  * @param bailOutShrinkage §8.1: if a later round's build input shrank less
  *                      than this fraction vs. the previous round, hashing
  *                      is ineffective — switch to block nested loop join
  * @param reloadSpilled §8.5: after the build phase, reload spilled build
  *                      partitions that fit in leftover memory
  * @param memFudge      fudge factor for "fits in memory" tests (hash-table
  *                      overhead allowance; the paper's simulator uses 1.4)
  * @param maxDepth      recursion depth cap; deeper rounds fall back to BNLJ
  */
final case class HHJConfig(
    memoryFrames: Int,
    frameSize: Int = 32 * 1024,
    partitionRule: PartitionRule = PartitionRule.Dynamic(),
    insertion: () => InsertionPolicy = () => Append(8),
    victim: () => VictimPolicy = () => LargestSize,
    growth: GrowthPolicy = GrowthPolicy.NGNS,
    eq2Fudge: Double = 1.3,
    roleReversal: Boolean = true,
    inMemoryHashJoin: Boolean = true,
    bailOutShrinkage: Double = 0.2,
    reloadSpilled: Boolean = false,
    memFudge: Double = 1.4,
    maxDepth: Int = 16,
    seed: Long = 42,
) {
  require(memoryFrames >= 3, "need at least 3 frames of join memory")
  require(memoryFrames > partitionRule.firstRound,
    s"memoryFrames=$memoryFrames must exceed first-round partitions=${partitionRule.firstRound} " +
      "(each partition needs an output frame)")
}
