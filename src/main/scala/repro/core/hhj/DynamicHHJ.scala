package repro.core.hhj

import scala.collection.mutable
import scala.collection.mutable.ArrayBuffer

import repro.core.frames.{Frame, FramePool, JoinRec, PartitionState, SplitFun}
import repro.core.growth.GrowthPolicy
import repro.core.spill.{SpillFile, SpillStore}
import repro.core.victim.VictimContext

/** The Dynamic Hybrid Hash Join operator (paper §2.3), with every design
  * dimension the paper studies made pluggable:
  *
  *   - number of partitions per round ([[PartitionRule]], §4),
  *   - partition insertion ([[repro.core.insertion.InsertionPolicy]], §5),
  *   - spilled-partition growth ([[GrowthPolicy]], §6),
  *   - victim selection ([[repro.core.victim.VictimPolicy]], §7),
  *   - the §8 optimizations (role reversal, in-memory hash join rounds,
  *     bail-out to block nested loop join, reloading spilled partitions).
  *
  * Matching is on the 64-bit record key; `emit(buildRec, probeRec)` fires
  * for every key-equal pair, and callers whose true join keys are wider
  * than 64 bits re-verify equality inside `emit` (hash collisions can only
  * produce false candidates, never lost matches).
  */
object DynamicHHJ {

  def join[T](
      build: Iterator[JoinRec[T]],
      probe: Iterator[JoinRec[T]],
      cfg: HHJConfig,
      store: SpillStore[T],
      emit: (JoinRec[T], JoinRec[T]) => Unit,
  ): HHJStats = {
    val stats = new HHJStats
    val p1    = math.min(cfg.partitionRule.firstRound, cfg.memoryFrames - 1)
    val pairs = runRound(build, probe, p1, depth = 0, totalBuildBytes = None, cfg, store, stats, emit)
    pairs.foreach { case (bf, pf, roundBuildBytes) =>
      processPair(bf, pf, parentBuildBytes = roundBuildBytes, depth = 1, cfg, store, stats, emit)
    }
    stats
  }

  // ------------------------------------------------------------------
  // Recursion over spilled (build, probe) file pairs
  // ------------------------------------------------------------------

  private def processPair[T](
      buildFile: SpillFile[T],
      probeFile: SpillFile[T],
      parentBuildBytes: Long,
      depth: Int,
      cfg: HHJConfig,
      store: SpillStore[T],
      stats: HHJStats,
      emit: (JoinRec[T], JoinRec[T]) => Unit,
  ): Unit = {
    stats.maxDepthReached = math.max(stats.maxDepthReached, depth)
    var b = buildFile
    var p = probeFile
    if (b.records == 0 || p.records == 0) { b.delete(); p.delete(); return }

    // §8.2 role reversal: sizes are known now; the smaller side builds. The
    // caller's emit contract is (originalBuildRec, originalProbeRec), so a
    // reversal must re-orient the callback for everything below this point.
    var em = emit
    if (cfg.roleReversal && p.bytes < b.bytes) {
      val t = b; b = p; p = t; stats.roleReversals += 1
      val prev = em
      em = (x: JoinRec[T], y: JoinRec[T]) => prev(y, x)
    }

    val memBytes = cfg.memoryFrames.toLong * cfg.frameSize
    if (cfg.inMemoryHashJoin && b.bytes * cfg.memFudge <= memBytes) {
      // §8.3: skip partitioning, hash-join directly in memory.
      inMemoryHashJoin(b, p, stats, em)
    } else if (depth >= cfg.maxDepth || b.bytes > (1.0 - cfg.bailOutShrinkage) * parentBuildBytes) {
      // §8.1 bail-out: hashing is not shrinking the input — the join
      // attribute is pathologically skewed. Fall back to BNLJ.
      blockNestedLoopJoin(b, p, cfg, stats, em)
    } else {
      val numP = PartitionRule.forRound(cfg.partitionRule, b.bytes, cfg.memoryFrames, cfg.frameSize, cfg.eq2Fudge)
      stats.io.noteRead(b.frames, b.bytes)
      stats.io.noteRead(p.frames, p.bytes)
      val pairs =
        runRound(b.readAll(), p.readAll(), numP, depth, Some(b.bytes), cfg, store, stats, em)
      val thisBuildBytes = b.bytes
      b.delete(); p.delete()
      pairs.foreach { case (bf, pf, _) =>
        processPair(bf, pf, parentBuildBytes = thisBuildBytes, depth + 1, cfg, store, stats, em)
      }
      return
    }
    b.delete(); p.delete()
  }

  /** §8.3: build side fits in memory — build the hash table directly. */
  private def inMemoryHashJoin[T](
      b: SpillFile[T],
      p: SpillFile[T],
      stats: HHJStats,
      emit: (JoinRec[T], JoinRec[T]) => Unit,
  ): Unit = {
    stats.inMemoryRounds += 1
    stats.io.noteRead(b.frames, b.bytes)
    stats.io.noteRead(p.frames, p.bytes)
    val table = new mutable.LongMap[ArrayBuffer[JoinRec[T]]]()
    b.readAll().foreach { r =>
      stats.buildRecordsProcessed += 1
      table.getOrElseUpdate(r.key, new ArrayBuffer[JoinRec[T]](1)) += r
    }
    p.readAll().foreach { r =>
      stats.probeRecordsProcessed += 1
      table.get(r.key).foreach { bs =>
        var i = 0
        while (i < bs.size) { stats.outputRecords += 1; emit(bs(i), r); i += 1 }
      }
    }
  }

  /** §8.1 bail-out target: block nested loop join over the file pair. Loads
    * the build side block-by-block (M-1 frames of declared bytes) and
    * re-scans the probe side once per block.
    */
  private def blockNestedLoopJoin[T](
      b: SpillFile[T],
      p: SpillFile[T],
      cfg: HHJConfig,
      stats: HHJStats,
      emit: (JoinRec[T], JoinRec[T]) => Unit,
  ): Unit = {
    stats.bnljRounds += 1
    val blockBytes = (cfg.memoryFrames - 1).toLong * cfg.frameSize
    val bIt        = b.readAll()
    stats.io.noteRead(b.frames, b.bytes)
    while (bIt.hasNext) {
      // Load one block of the build side.
      val table = new mutable.LongMap[ArrayBuffer[JoinRec[T]]]()
      var load  = 0L
      while (bIt.hasNext && load < blockBytes) {
        val r = bIt.next()
        stats.buildRecordsProcessed += 1
        load += r.size
        table.getOrElseUpdate(r.key, new ArrayBuffer[JoinRec[T]](1)) += r
      }
      // One full probe pass per block.
      stats.io.noteRead(p.frames, p.bytes)
      p.readAll().foreach { r =>
        stats.probeRecordsProcessed += 1
        table.get(r.key).foreach { bs =>
          var i = 0
          while (i < bs.size) { stats.outputRecords += 1; emit(bs(i), r); i += 1 }
        }
      }
    }
  }

  // ------------------------------------------------------------------
  // One partitioned round: dynamic build phase + probe phase
  // ------------------------------------------------------------------

  /** Runs one build+probe round over iterators; returns the spilled
    * (buildFile, probeFile, thisRoundBuildBytes) pairs for recursion.
    */
  private def runRound[T](
      buildIt: Iterator[JoinRec[T]],
      probeIt: Iterator[JoinRec[T]],
      numPartitions: Int,
      depth: Int,
      totalBuildBytes: Option[Long],
      cfg: HHJConfig,
      store: SpillStore[T],
      stats: HHJStats,
      emit: (JoinRec[T], JoinRec[T]) => Unit,
  ): Seq[(SpillFile[T], SpillFile[T], Long)] = {
    stats.rounds += 1
    val P = numPartitions
    require(P >= 2 && P < cfg.memoryFrames, s"partitions=$P must be in [2, memoryFrames)")

    val pool       = new FramePool(cfg.memoryFrames, cfg.frameSize)
    val parts      = Array.tabulate(P)(new PartitionState[T](_, cfg.frameSize))
    val insertion  = cfg.insertion()
    val victim     = cfg.victim()
    val seed       = cfg.seed + depth
    val buildFiles = new Array[SpillFile[T]](P)
    var numSpilled = 0
    var consumed   = 0L // build bytes read so far (Best-Match context)
    var roundBuild = 0L

    def buildFile(pid: Int): SpillFile[T] = {
      if (buildFiles(pid) == null) buildFiles(pid) = store.newFile(s"d$depth-p$pid-build")
      buildFiles(pid)
    }

    def noteBuildWrite(bytes: Long, nFrames: Long): Unit = {
      stats.io.noteWrite(nFrames, bytes)
      stats.buildIo.noteWrite(nFrames, bytes)
      stats.buildSpillBytes += bytes
      if (depth == 0) stats.round1BuildSpillBytes += bytes
    }

    /** Spill a memory-resident partition: all frames out in one sequential
      * write, frames returned to the pool.
      */
    def spillPartition(p: PartitionState[T]): Unit = {
      val n     = p.frames.size
      val bytes = p.bytesInMemory
      val recs  = p.recordsInMemory
      buildFile(p.id).append(p.frames.iterator.flatMap(_.records.iterator), n.toLong)
      noteBuildWrite(bytes, n.toLong)
      p.noteFlushed(bytes, recs, n.toLong)
      pool.release(p.dropAllFrames())
      p.spilled = true
      numSpilled += 1
      stats.victimSpills += 1
    }

    /** Flush a spilled partition's accumulated in-memory frames (G-S steal,
      * NG-NS buffer flush, end-of-build drain).
      */
    def flushSpilled(p: PartitionState[T]): Unit = {
      val n = p.frames.size
      if (n == 0) return
      val bytes = p.bytesInMemory
      val recs  = p.recordsInMemory
      buildFile(p.id).append(p.frames.iterator.flatMap(_.records.iterator), n.toLong)
      noteBuildWrite(bytes, n.toLong)
      p.noteFlushed(bytes, recs, n.toLong)
      pool.release(p.dropAllFrames())
    }

    /** Free at least one frame. `incoming` is the partition id of the record
      * that triggered the pressure.
      */
    def makeRoom(incoming: Int): Unit = {
      if (cfg.growth == GrowthPolicy.GS) {
        // Steal: flush the spilled partition holding the most frames first.
        // A 1-frame accumulation is not worth stealing while a resident
        // victim exists — flushing it would fragment G-S's sequential
        // chunks into the very single-frame writes the policy avoids.
        var best: PartitionState[T] = null
        var i                       = 0
        while (i < P) {
          val p = parts(i)
          if (p.spilled && p.frames.nonEmpty && (best == null || p.frames.size > best.frames.size)) best = p
          i += 1
        }
        if (best != null && best.frames.size >= 2) { flushSpilled(best); return }
        val anyResident = parts.exists(p => !p.spilled && p.frames.nonEmpty)
        if (best != null && !anyResident) { flushSpilled(best); return }
      }
      val candidates = parts.iterator.filter(p => !p.spilled && p.frames.nonEmpty).toIndexedSeq
      if (candidates.isEmpty)
        throw new IllegalStateException(
          s"no victim available: P=$P M=${cfg.memoryFrames} — memory too small for partition count")
      val ctx = VictimContext(P, numSpilled, incoming, totalBuildBytes.map(t => math.max(0L, t - consumed)))
      spillPartition(parts(victim.choose(candidates, ctx)))
    }

    def acquireFrameFor(pid: Int): Unit =
      if (!pool.tryAcquire()) {
        makeRoom(pid)
        if (!pool.tryAcquire())
          throw new IllegalStateException("makeRoom freed no frames")
      }

    /** NG-NS path for a record hashed to a spilled partition: a single
      * output-buffer frame, flushed (one random write) when full.
      */
    def insertSpilledNGNS(p: PartitionState[T], r: JoinRec[T]): Unit = {
      if (p.frames.isEmpty) { acquireFrameFor(p.id); p.appendFrame() }
      val buf = p.frames(0)
      if (buf.free < r.size) {
        val bytes = buf.used.toLong
        val recs  = buf.recordCount.toLong
        buildFile(p.id).append(buf.records.iterator.to(Iterator), 1L)
        noteBuildWrite(bytes, 1L)
        p.noteFlushed(bytes, recs, 1L)
        buf.clear()
      }
      p.insertInto(0, r)
    }

    /** G-S path: a spilled partition grows like a resident one. */
    def insertSpilledGS(p: PartitionState[T], r: JoinRec[T]): Unit = {
      val idx = insertion.chooseFrame(p, r.size, stats.search)
      if (idx >= 0) { p.insertInto(idx, r); insertion.inserted(p, idx, r.size) }
      else {
        acquireFrameFor(p.id)
        p.appendFrame()
        p.insertInto(p.frames.size - 1, r)
        insertion.inserted(p, p.frames.size - 1, r.size)
      }
    }

    def insertResident(p: PartitionState[T], r: JoinRec[T]): Unit = {
      val idx = insertion.chooseFrame(p, r.size, stats.search)
      if (idx >= 0) { p.insertInto(idx, r); insertion.inserted(p, idx, r.size) }
      else if (pool.tryAcquire()) {
        p.appendFrame()
        p.insertInto(p.frames.size - 1, r)
        insertion.inserted(p, p.frames.size - 1, r.size)
      } else {
        makeRoom(p.id)
        if (p.spilled) {
          // The victim policy chose this very partition (self-victim).
          if (cfg.growth == GrowthPolicy.GS) insertSpilledGS(p, r) else insertSpilledNGNS(p, r)
        } else {
          acquireFrameFor(p.id)
          p.appendFrame()
          p.insertInto(p.frames.size - 1, r)
          insertion.inserted(p, p.frames.size - 1, r.size)
        }
      }
    }

    // ---------------- Build phase ----------------
    while (buildIt.hasNext) {
      val r = buildIt.next()
      require(r.size <= cfg.frameSize, s"record of ${r.size} B exceeds frame size ${cfg.frameSize}")
      stats.buildRecordsProcessed += 1
      stats.search.insertions += 1
      consumed += r.size
      roundBuild += r.size
      val pid = SplitFun.partition(r.key, seed, P)
      val p   = parts(pid)
      if (!p.spilled) insertResident(p, r)
      else if (cfg.growth == GrowthPolicy.GS) insertSpilledGS(p, r)
      else insertSpilledNGNS(p, r)
    }

    // Round-1 metrics are sampled before the end-of-build drain.
    if (depth == 0) {
      stats.round1Partitions = P
      var frames = 0; var fullness = 0.0; var resident = 0L
      parts.foreach { p =>
        p.frames.foreach { f => frames += 1; fullness += f.fullness }
        if (!p.spilled) resident += p.bytesInMemory
      }
      stats.round1Frames = frames
      stats.round1AvgFullness = if (frames == 0) Double.NaN else fullness / frames
      stats.round1ResidentBytes = resident
      stats.round1SpilledPartitions = parts.count(_.spilled)
    }

    // Drain spilled partitions' remaining in-memory frames.
    parts.foreach(p => if (p.spilled) flushSpilled(p))

    // §8.5: reload spilled build partitions that fit in leftover memory.
    if (cfg.reloadSpilled && numSpilled > 0) {
      var changed = true
      while (changed) {
        changed = false
        val stillSpilled = parts.filter(_.spilled)
        val fit = stillSpilled
          .filter { p =>
            // The file's records repacked into `spilledFrames` frames before;
            // expect the same on reload (the abort path below keeps an
            // underestimate safe). Leave one probe output buffer per
            // partition that stays spilled.
            p.spilledFrames <= pool.available - (stillSpilled.length - 1)
          }
          .sortBy(-_.spilledBytes)
        fit.headOption.foreach { p =>
          val f = buildFiles(p.id)
          stats.io.noteRead(f.frames, f.bytes)
          val recs = f.readAll().toArray
          f.delete(); buildFiles(p.id) = null
          p.noteReloaded()
          numSpilled -= 1
          stats.reloadedPartitions += 1
          var i       = 0
          var aborted = false
          while (i < recs.length && !aborted) {
            val r   = recs(i)
            val idx = insertion.chooseFrame(p, r.size, stats.search)
            if (idx >= 0) { p.insertInto(idx, r); insertion.inserted(p, idx, r.size); i += 1 }
            else if (pool.tryAcquire()) {
              p.appendFrame()
              p.insertInto(p.frames.size - 1, r)
              insertion.inserted(p, p.frames.size - 1, r.size)
              i += 1
            } else {
              // The fudge guard under-estimated fragmentation (possible with
              // near-frame-size records): write everything back out and keep
              // the partition spilled.
              val n     = p.frames.size
              val bytes = p.bytesInMemory
              val cnt   = p.recordsInMemory
              buildFile(p.id).append(p.frames.iterator.flatMap(_.records.iterator) ++ recs.iterator.drop(i), n.toLong)
              noteBuildWrite(bytes + recs.iterator.drop(i).map(_.size.toLong).sum, n.toLong)
              p.noteFlushed(bytes, cnt, n.toLong)
              p.spilledBytes += recs.iterator.drop(i).map(_.size.toLong).sum
              p.spilledRecs += recs.length - i
              pool.release(p.dropAllFrames())
              p.spilled = true
              numSpilled += 1
              stats.reloadedPartitions -= 1
              aborted = true
            }
          }
          changed = !aborted
        }
      }
    }

    // Reserve one probe output buffer per spilled partition; under G-S the
    // residents may have grown into the whole pool, so destage until the
    // buffers fit.
    while (pool.available < numSpilled) makeRoom(incoming = -1)

    // ---------------- Hash table over resident partitions ----------------
    val table = new mutable.LongMap[ArrayBuffer[JoinRec[T]]]()
    parts.foreach { p =>
      if (!p.spilled) p.frames.foreach { f =>
        f.records.foreach(r => table.getOrElseUpdate(r.key, new ArrayBuffer[JoinRec[T]](1)) += r)
      }
    }

    // ---------------- Probe phase ----------------
    val probeFiles = new Array[SpillFile[T]](P)
    val probeBufs  = new Array[Frame[T]](P)

    def probeFile(pid: Int): SpillFile[T] = {
      if (probeFiles(pid) == null) probeFiles(pid) = store.newFile(s"d$depth-p$pid-probe")
      probeFiles(pid)
    }

    def flushProbeBuf(pid: Int): Unit = {
      val buf = probeBufs(pid)
      if (buf == null || buf.recordCount == 0) return
      probeFile(pid).append(buf.records.iterator.to(Iterator), 1L)
      stats.io.noteWrite(1L, buf.used.toLong)
      stats.probeSpillBytes += buf.used
      buf.clear()
    }

    while (probeIt.hasNext) {
      val r = probeIt.next()
      require(r.size <= cfg.frameSize, s"record of ${r.size} B exceeds frame size ${cfg.frameSize}")
      stats.probeRecordsProcessed += 1
      val pid = SplitFun.partition(r.key, seed, P)
      if (!parts(pid).spilled) {
        table.get(r.key).foreach { bs =>
          var i = 0
          while (i < bs.size) { stats.outputRecords += 1; emit(bs(i), r); i += 1 }
        }
      } else {
        if (probeBufs(pid) == null) {
          require(pool.tryAcquire(), "probe buffer reservation failed") // reserved above
          probeBufs(pid) = new Frame[T](cfg.frameSize)
        }
        if (!probeBufs(pid).insert(r)) { flushProbeBuf(pid); require(probeBufs(pid).insert(r)) }
      }
    }
    (0 until P).foreach(flushProbeBuf)

    // Pair up the spilled files for the next rounds. A spilled build
    // partition whose probe side is empty joins to nothing — drop it.
    val pairs = ArrayBuffer.empty[(SpillFile[T], SpillFile[T], Long)]
    (0 until P).foreach { pid =>
      val bf = buildFiles(pid)
      val pf = probeFiles(pid)
      (bf, pf) match {
        case (null, null) => ()
        case (b, null)    => if (b != null) b.delete()
        case (null, f)    => f.delete()
        case (b, f)       => if (b.records > 0 && f.records > 0) pairs += ((b, f, roundBuild)) else { b.delete(); f.delete() }
      }
    }
    pairs.toSeq
  }
}
