package repro.spark

import java.io.{DataInputStream, DataOutputStream}
import java.nio.file.Files

import scala.collection.mutable.ArrayBuffer

import org.apache.spark.HashPartitioner
import org.apache.spark.sql.{DataFrame, Row}
import org.apache.spark.sql.types.StructType

import repro.core.frames.JoinRec
import repro.core.hhj.{DynamicHHJ, HHJConfig, HHJStats}
import repro.core.spill.{DiskSpillStore, Serde}

/** Dynamic Hybrid Hash Join as a Spark operator.
  *
  * Per the reproduction plan (DESIGN.md): both inputs are keyed on their
  * join attributes, hash-co-partitioned with one `HashPartitioner`, and
  * `zipPartitions` runs one instance of the paper's operator
  * ([[repro.core.hhj.DynamicHHJ]]) per Spark partition inside the executor —
  * each with its own frame budget and a real on-disk spill store, exactly
  * like one AsterixDB node partition. DataFrames in, DataFrame out.
  *
  * Join semantics: inner equi-join. Following AsterixDB's FROM-clause rule
  * (§2.2: the first input is the probe side), `left` probes and `right`
  * builds. Matching inside the operator is on a 64-bit key hash and is
  * re-verified against the real key values before a row is emitted, so hash
  * collisions cannot produce wrong results.
  */
object HHJoin {

  /** Inner equi-join of `left` and `right`.
    *
    * @param leftKeys  join column names in `left` (probe side)
    * @param rightKeys join column names in `right` (build side), positionally
    *                  matched with `leftKeys`
    * @param cfg       the Dynamic HHJ configuration used in every task
    * @param numPartitions Spark-level partition count (0 = session default)
    */
  def join(
      left: DataFrame,
      right: DataFrame,
      leftKeys: Seq[String],
      rightKeys: Seq[String],
      cfg: HHJConfig = HHJConfig(memoryFrames = 64, frameSize = 32 * 1024),
      numPartitions: Int = 0,
  ): DataFrame = {
    require(leftKeys.nonEmpty && leftKeys.size == rightKeys.size, "key lists must match positionally")
    val spark = left.sparkSession
    val n =
      if (numPartitions > 0) numPartitions
      else spark.sessionState.conf.numShufflePartitions

    val lIdx = leftKeys.map(left.schema.fieldIndex).toArray
    val rIdx = rightKeys.map(right.schema.fieldIndex).toArray

    val partitioner = new HashPartitioner(n)
    // Null join keys never match in an equi-join: drop them before routing.
    val lkv = left.rdd
      .flatMap(r => keyHash(r, lIdx).map(h => (h, r)))
      .partitionBy(partitioner)
    val rkv = right.rdd
      .flatMap(r => keyHash(r, rIdx).map(h => (h, r)))
      .partitionBy(partitioner)

    val outSchema = StructType(left.schema.fields ++ right.schema.fields)
    val joined = lkv.zipPartitions(rkv, preservesPartitioning = false) { (probeIt, buildIt) =>
      joinPartition(buildIt, probeIt, rIdx, lIdx, cfg)
    }
    spark.createDataFrame(joined, outSchema)
  }

  /** One task's join: the paper's operator over this co-partition pair.
    * Returns output rows as probeFields ++ buildFields reordered to
    * (left ++ right).
    */
  private def joinPartition(
      buildIt: Iterator[(Long, Row)],
      probeIt: Iterator[(Long, Row)],
      buildKeyIdx: Array[Int],
      probeKeyIdx: Array[Int],
      cfg: HHJConfig,
  ): Iterator[Row] = {
    val dir   = Files.createTempDirectory("hhj-spill").toFile
    val store = new DiskSpillStore[Row](dir, RowSerde)
    val out   = ArrayBuffer.empty[Row]
    try {
      val stats: HHJStats = DynamicHHJ.join(
        buildIt.map { case (k, row) => JoinRec(k, rowSizeEstimate(row, cfg.frameSize), row) },
        probeIt.map { case (k, row) => JoinRec(k, rowSizeEstimate(row, cfg.frameSize), row) },
        cfg,
        store,
        (b: JoinRec[Row], p: JoinRec[Row]) =>
          if (keysEqual(b.payload, buildKeyIdx, p.payload, probeKeyIdx))
            out += Row.fromSeq(p.payload.toSeq ++ b.payload.toSeq),
      )
      LastStats.set(stats)
    } finally {
      store.close()
      dir.delete(): Unit
    }
    out.iterator
  }

  /** 64-bit key hash, canonicalized so e.g. Int 5 and Long 5 collide (they
    * are then verified equal). None for rows with any null key.
    */
  private[spark] def keyHash(r: Row, idx: Array[Int]): Option[Long] = {
    var h = 0x9E3779B97F4A7C15L
    var i = 0
    while (i < idx.length) {
      val v = r.get(idx(i))
      if (v == null) return None
      h = scala.util.hashing.byteswap64(h ^ canonical(v))
      i += 1
    }
    Some(h)
  }

  private def canonical(v: Any): Long = v match {
    case l: Long                 => l
    case i: Int                  => i.toLong
    case s: Short                => s.toLong
    case b: Byte                 => b.toLong
    case d: java.sql.Date        => d.toLocalDate.toEpochDay
    case d: java.time.LocalDate  => d.toEpochDay
    case other                   => other.hashCode.toLong
  }

  /** Exact key equality check applied on emit (collision filter). */
  private[spark] def keysEqual(b: Row, bIdx: Array[Int], p: Row, pIdx: Array[Int]): Boolean = {
    var i = 0
    while (i < bIdx.length) {
      val x = b.get(bIdx(i)); val y = p.get(pIdx(i))
      val eq = (x, y) match {
        case (a: Number, c: Number)
            if isIntegral(a) && isIntegral(c)    => a.longValue == c.longValue
        case (a: Number, c: Number)              => a.doubleValue == c.doubleValue
        case (a: java.sql.Date, c: java.sql.Date) => a.toLocalDate == c.toLocalDate
        case _                                   => x == y
      }
      if (!eq) return false
      i += 1
    }
    true
  }

  private def isIntegral(n: Number): Boolean =
    n.isInstanceOf[java.lang.Long] || n.isInstanceOf[java.lang.Integer] ||
      n.isInstanceOf[java.lang.Short] || n.isInstanceOf[java.lang.Byte]

  /** Declared in-frame size of a row: a flat estimate of its field widths.
    * Used for frame-occupancy accounting; spilled bytes are the serialized
    * form. Clamped to the frame size so an outsized row degrades to
    * one-row-per-frame instead of failing the operator.
    */
  private[spark] def rowSizeEstimate(r: Row, frameSize: Int): Int = {
    var s = 16
    var i = 0
    while (i < r.length) {
      s += (r.get(i) match {
        case null          => 4
        case v: String     => 8 + 2 * v.length
        case _: java.lang.Double | _: java.lang.Long => 8
        case _             => 8
      })
      i += 1
    }
    math.min(s, frameSize)
  }

  /** Serde for spilled rows: java-serializes only the value array (the
    * operator accesses fields by index, so the schema need not travel with
    * every record).
    */
  private object RowSerde extends Serde[Row] {
    def write(r: Row, out: DataOutputStream): Unit = {
      val bos = new java.io.ByteArrayOutputStream()
      val oos = new java.io.ObjectOutputStream(bos)
      oos.writeObject(r.toSeq.toArray); oos.close()
      val b = bos.toByteArray
      out.writeInt(b.length); out.write(b)
    }
    def read(in: DataInputStream): Row = {
      val n = in.readInt()
      val b = new Array[Byte](n)
      in.readFully(b)
      val values =
        new java.io.ObjectInputStream(new java.io.ByteArrayInputStream(b)).readObject().asInstanceOf[Array[Any]]
      Row.fromSeq(scala.collection.immutable.ArraySeq.unsafeWrapArray(values))
    }
  }
}

/** Test hook: aggregated spill statistics across the per-partition joins
  * executed in this JVM (meaningful in local mode, where all tasks share
  * the JVM). Reset before a query, inspect after it completes.
  */
object LastStats {
  import java.util.concurrent.atomic.AtomicLong
  val spillBytes   = new AtomicLong
  val rounds       = new AtomicLong
  val victimSpills = new AtomicLong
  val bnljRounds   = new AtomicLong

  private[spark] def set(s: HHJStats): Unit = {
    spillBytes.addAndGet(s.totalSpillBytes)
    rounds.addAndGet(s.rounds.toLong)
    victimSpills.addAndGet(s.victimSpills)
    bnljRounds.addAndGet(s.bnljRounds.toLong)
    ()
  }

  def reset(): Unit = { spillBytes.set(0); rounds.set(0); victimSpills.set(0); bnljRounds.set(0) }
}
