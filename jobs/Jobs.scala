package repro.jobs

import repro.bench.Studies
import repro.wisconsin.{KeyDist, RecordSpec}

/** spark-submit entrypoints, one per reproduced table/figure. The studies
  * themselves are engine-level (the paper's experiments are single-operator
  * runs), so these mains run anywhere a JVM runs; `SparkHHJDemoJob` is the
  * cluster-path demo. Examples:
  *
  *   spark-submit --class repro.jobs.Table1Job  target/scala-2.13/repro_2.13-*.jar
  *   spark-submit --class repro.jobs.Fig12Job   target/scala-2.13/repro_2.13-*.jar
  */
object Table1Job {
  def main(args: Array[String]): Unit = {
    println("Table 1: partitions by Eq. 2 (M = 128 MB, F = 1.3)")
    println(Studies.fmt(Seq("build MB", "partitions"), Studies.table1().map { case (mb, p) => Seq(mb, p) }))
  }
}

private object SweepSupport {
  val MemoryMB   = 16L
  val Inputs     = Seq(16L, 32L, 64L, 256L, 1024L)
  val Partitions = Seq(2, 4, 8, 16, 20, 24, 32, 64, 128)

  def print(fixedAllRounds: Boolean, metric: Studies.SweepCell => Double, title: String): Unit = {
    val cells = Studies.partitionSweep(MemoryMB, Inputs, Partitions, fixedAllRounds)
    println(title)
    println(Studies.fmt(
      Seq("input MB") ++ Partitions.map(p => s"P=$p"),
      Inputs.map(in => Seq[Any](in) ++ cells.filter(_.inputMB == in).map(metric(_))),
    ))
  }
}

object Fig3Job {
  def main(args: Array[String]): Unit =
    SweepSupport.print(fixedAllRounds = true, _.spilledMB,
      s"Figure 3: total spilled MB (M=${SweepSupport.MemoryMB} MB, fixed partitions all rounds)")
}

object Fig4Job {
  def main(args: Array[String]): Unit =
    SweepSupport.print(fixedAllRounds = false, _.spilledMB,
      s"Figure 4: total spilled MB (M=${SweepSupport.MemoryMB} MB, later rounds via Eq. 2)")
}

object Fig5Job {
  def main(args: Array[String]): Unit =
    SweepSupport.print(fixedAllRounds = true, _.residentMB,
      s"Figure 5: resident build MB at end of round 1 (M=${SweepSupport.MemoryMB} MB)")
}

object Fig678Job {
  def main(args: Array[String]): Unit =
    for (ratio <- Seq(0.9, 0.5, 0.1)) {
      val rows = Studies.parameterChoiceStudy(ratio)
      println(f"\nFigures 6-8: parameter choice, 1-Large Coexist, ${(ratio * 100).toInt}%% large")
      println(Studies.fmt(
        Seq("policy", "avg fullness", "frames searched", "rng calls"),
        rows.map(r => Seq(r.policy, r.frameFullness, r.framesSearched, r.rngCalls)),
      ))
    }
}

private object InsertionSupport {
  def print(title: String, spec: RecordSpec): Unit = {
    val rows = Studies.insertionStudy(Studies.standardInsertionPolicies(), spec)
    println(s"\n$title")
    println(Studies.fmt(
      Seq("policy", "avg fullness", "frames searched", "s(HDD)", "s(SSD)", "s(EBS)"),
      rows.map(r => Seq(r.policy, r.frameFullness, r.framesSearched, r.secondsHDD, r.secondsSSD, r.secondsEBS)),
    ))
  }
}

object Fig9Job {
  def main(args: Array[String]): Unit =
    InsertionSupport.print("Figure 9: insertion policies, All Small Records", RecordSpec.AllSmall)
}

object Fig10Job {
  def main(args: Array[String]): Unit =
    for (r <- Seq(0.1, 0.5, 0.9))
      InsertionSupport.print(f"Figure 10: 3-Large Coexist, ${(r * 100).toInt}%% large", RecordSpec.threeLarge(r))
}

object Fig11Job {
  def main(args: Array[String]): Unit =
    for (r <- Seq(0.1, 0.5, 0.9))
      InsertionSupport.print(f"Figure 11: 1-Large Coexist, ${(r * 100).toInt}%% large", RecordSpec.oneLarge(r))
}

object Fig12Job {
  def main(args: Array[String]): Unit = {
    val rows = Studies.growthStudy()
    println("Figure 12: G-S vs NG-NS growth policies (build-phase writes, HDD model)")
    println(Studies.fmt(
      Seq("data/mem", "policy", "written MB", "seq ops", "seq frames", "rand ops", "s cached", "s direct"),
      rows.map(r => Seq(r.dataMemRatio, r.policy, r.writtenMB, r.seqWriteOps, r.seqWriteFrames,
        r.randWriteOps, r.secondsCached, r.secondsDirect)),
    ))
  }
}

private object VictimSupport {
  def print(title: String, spec: RecordSpec, keys: KeyDist): Unit = {
    val rows     = Studies.victimStudy(spec, keys)
    val ratios   = rows.map(_.dataMemRatio).distinct
    val policies = rows.map(_.policy).distinct
    println(s"\n$title (spilled-data ratio = actual/ideal)")
    println(Studies.fmt(
      Seq("policy") ++ ratios.map(r => f"x$r%.1f"),
      policies.map(p =>
        Seq[Any](p) ++ ratios.map(rt => rows.find(x => x.policy == p && x.dataMemRatio == rt).get.spilledRatio)),
    ))
  }
}

object Fig13Job {
  def main(args: Array[String]): Unit = {
    VictimSupport.print("Figure 13a: All Small, uniform keys", RecordSpec.AllSmall, KeyDist.Unique)
    VictimSupport.print("Figure 13b: All Small, Normal-skew keys", RecordSpec.AllSmall, KeyDist.NormalSkew)
  }
}

object Fig14Job {
  def main(args: Array[String]): Unit =
    for (r <- Seq(0.1, 0.5, 0.9))
      VictimSupport.print(f"Figure 14: 1-Large, ${(r * 100).toInt}%% large, uniform keys",
        RecordSpec.oneLarge(r), KeyDist.Unique)
}

object Fig15Job {
  def main(args: Array[String]): Unit =
    for (r <- Seq(0.1, 0.5, 0.9))
      VictimSupport.print(f"Figure 15: 3-Large, ${(r * 100).toInt}%% large, uniform keys",
        RecordSpec.threeLarge(r), KeyDist.Unique)
}

object Fig16Job {
  def main(args: Array[String]): Unit =
    for (r <- Seq(0.1, 0.5, 0.9))
      VictimSupport.print(f"Figure 16: 1-Large, ${(r * 100).toInt}%% large, skewed keys",
        RecordSpec.oneLarge(r), KeyDist.NormalSkew)
}

object Fig17Job {
  def main(args: Array[String]): Unit =
    for (r <- Seq(0.1, 0.5, 0.9))
      VictimSupport.print(f"Figure 17: 3-Large, ${(r * 100).toInt}%% large, skewed keys",
        RecordSpec.threeLarge(r), KeyDist.NormalSkew)
}
