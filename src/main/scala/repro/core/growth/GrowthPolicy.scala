package repro.core.growth

/** Memory-allocation policy for partitions that have already spilled (§6). */
sealed trait GrowthPolicy {
  def name: String
}

object GrowthPolicy {

  /** No Grow-No Steal: a spilled partition holds exactly one output-buffer
    * frame; a full buffer is flushed to disk as a single-frame (random)
    * write. Only memory-resident partitions are victim candidates.
    * AsterixDB's choice (filesystem cache absorbs the random writes).
    */
  case object NGNS extends GrowthPolicy { val name = "NG-NS" }

  /** Grow-Steal: spilled partitions may reacquire frames as memory allows;
    * under memory pressure, spilled partitions are victimized *first*
    * ("steal"), flushing their accumulated frames as one multi-frame
    * sequential write.
    */
  case object GS extends GrowthPolicy { val name = "G-S" }
}

/** The §6.1 analytical I/O model for the two growth policies, with the
  * paper's Table-3 notation: R = build size in frames, M = memory in frames,
  * P = partitions, x = spilled partitions.
  *
  * Both policies write (almost) the same volume; they differ in how much of
  * it is sequential. Equations 4 and 7 of the paper.
  */
object GrowthCostModel {

  /** Equation 3 (rearranged): number of partitions that spill, assuming
    * uniform data — the smallest x such that the remaining P-x partitions
    * (each R/P frames) plus x output buffers fit in M frames.
    */
  def spilledPartitions(R: Long, M: Long, P: Int): Int = {
    var x = 0
    while (x < P && (P - x) * (R.toDouble / P) + x > M) x += 1
    x
  }

  /** Equation 4: (randomFrames, sequentialFrames) written during the build
    * phase under NG-NS. Each victim writes (M-i+1)/(P-i+1) frames
    * sequentially at spill time; the rest of its R/P frames go out one
    * frame at a time.
    */
  def ngnsFrames(R: Long, M: Long, P: Int): (Double, Double) = {
    val x   = spilledPartitions(R, M, P)
    var rnd = 0.0; var seq = 0.0
    for (i <- 1 to x) {
      val atSpill = (M - i + 1).toDouble / (P - i + 1)
      seq += atSpill
      rnd += math.max(0.0, R.toDouble / P - atSpill)
    }
    (rnd, seq)
  }

  /** Equation 7: under G-S all of a spilled partition's data goes out
    * sequentially — the initial chunk plus the geometric-series regrowth
    * chunks (Equations 5-6), which total the same volume as NG-NS's random
    * remainder but in multi-frame writes.
    */
  def gsFrames(R: Long, M: Long, P: Int): (Double, Double) = {
    val (rnd, seq) = ngnsFrames(R, M, P)
    (0.0, rnd + seq)
  }
}
