package repro.storage

import org.scalatest.funsuite.AnyFunSuite

import repro.core.hhj.HHJStats

class StorageModelSpec extends AnyFunSuite {

  private def statsWith(
      seqFrames: Long = 0,
      seqOps: Long = 0,
      randOps: Long = 0,
      bytesWritten: Long = 0,
      bytesRead: Long = 0,
      records: Long = 0,
      framesSearched: Long = 0,
      rngCalls: Long = 0,
  ): HHJStats = {
    val s = new HHJStats
    s.io.seqWriteFrames = seqFrames
    s.io.seqWriteOps = seqOps
    s.io.randWriteOps = randOps
    s.io.randWriteFrames = randOps
    s.io.bytesWritten = bytesWritten
    s.io.bytesRead = bytesRead
    s.buildRecordsProcessed = records
    s.search.framesSearched = framesSearched
    s.search.rngCalls = rngCalls
    s
  }

  test("device catalog has the expected ordering of random I/O capability") {
    assert(Device.HDD.randIOPS < Device.EBS.randIOPS)
    assert(Device.EBS.randIOPS < Device.SSD.randIOPS)
  }

  test("cpu time grows with records processed") {
    val a = ResponseTimeModel.cpuSeconds(statsWith(records = 1000))
    val b = ResponseTimeModel.cpuSeconds(statsWith(records = 2000))
    assert(b > a)
  }

  test("cpu time grows with frames searched") {
    val a = ResponseTimeModel.cpuSeconds(statsWith(records = 1000, framesSearched = 0))
    val b = ResponseTimeModel.cpuSeconds(statsWith(records = 1000, framesSearched = 1000000))
    assert(b > a)
  }

  test("rng calls cost extra cpu (the paper's Random(%p) penalty)") {
    val a = ResponseTimeModel.cpuSeconds(statsWith(framesSearched = 1000))
    val b = ResponseTimeModel.cpuSeconds(statsWith(framesSearched = 1000, rngCalls = 1000))
    assert(b > a)
  }

  test("random writes on HDD without cache dominate response time") {
    val randomHeavy = statsWith(randOps = 100000, bytesWritten = 100000L * 32768)
    val seqHeavy    = statsWith(seqFrames = 100000, seqOps = 100, bytesWritten = 100000L * 32768)
    val tRand = ResponseTimeModel.ioSeconds(randomHeavy, 0, Device.HDD, fsCache = false)
    val tSeq  = ResponseTimeModel.ioSeconds(seqHeavy, 0, Device.HDD, fsCache = false)
    assert(tRand > 10 * tSeq, s"random $tRand vs sequential $tSeq")
  }

  test("the filesystem cache erases most of the random-write penalty (§6.2)") {
    val randomHeavy = statsWith(randOps = 100000, bytesWritten = 100000L * 32768)
    val cached   = ResponseTimeModel.ioSeconds(randomHeavy, 0, Device.HDD, fsCache = true)
    val uncached = ResponseTimeModel.ioSeconds(randomHeavy, 0, Device.HDD, fsCache = false)
    assert(uncached > 5 * cached)
  }

  test("identical traces run faster on SSD than HDD") {
    val s = statsWith(seqFrames = 10000, seqOps = 50, randOps = 5000, bytesWritten = 15000L * 32768, bytesRead = 1L << 30)
    val hdd = ResponseTimeModel.ioSeconds(s, 1L << 30, Device.HDD, fsCache = false)
    val ssd = ResponseTimeModel.ioSeconds(s, 1L << 30, Device.SSD, fsCache = false)
    assert(ssd < hdd)
  }

  test("reading more base input costs more time") {
    val s = statsWith()
    val a = ResponseTimeModel.ioSeconds(s, 1L << 28, Device.SSD, fsCache = true)
    val b = ResponseTimeModel.ioSeconds(s, 1L << 30, Device.SSD, fsCache = true)
    assert(b > a)
  }

  test("seconds() composes cpu and io additively") {
    val s = statsWith(records = 1000000, bytesWritten = 1L << 28, seqFrames = 8192, seqOps = 10)
    val total = ResponseTimeModel.seconds(s, 1L << 28, Device.SSD)
    assert(math.abs(total - (ResponseTimeModel.cpuSeconds(s) + ResponseTimeModel.ioSeconds(s, 1L << 28, Device.SSD, fsCache = true))) < 1e-12)
  }

  test("an empty run costs (almost) nothing") {
    assert(ResponseTimeModel.seconds(new HHJStats, 0, Device.SSD) == 0.0)
  }
}
