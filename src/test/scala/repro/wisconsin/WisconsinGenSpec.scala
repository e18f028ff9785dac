package repro.wisconsin

import org.scalatest.funsuite.AnyFunSuite

class WisconsinGenSpec extends AnyFunSuite {

  test("All-Small spec matches Table 2 (700-1500 B, no large records)") {
    val s = RecordSpec.AllSmall
    assert(s.smallMin == 700 && s.smallMax == 1500 && !s.hasLarge)
  }

  test("1-Large spec matches Table 2 (18-20 KB large records)") {
    val s = RecordSpec.oneLarge(0.5)
    assert(s.largeMin == 18 * 1024 && s.largeMax == 20 * 1024 && s.largeRatio == 0.5)
  }

  test("3-Large spec matches Table 2 (8-10 KB large records)") {
    val s = RecordSpec.threeLarge(0.1)
    assert(s.largeMin == 8 * 1024 && s.largeMax == 10 * 1024)
  }

  test("expected size interpolates small and large populations") {
    val s = RecordSpec.oneLarge(0.5)
    val expected = 0.5 * (700 + 1500) / 2.0 + 0.5 * (18 * 1024 + 20 * 1024) / 2.0
    assert(math.abs(s.expectedSize - expected) < 1e-9)
  }

  test("generated sizes respect the configured ranges") {
    val recs = WisconsinGen.records(20000, RecordSpec.threeLarge(0.3), KeyDist.Unique, seed = 1).toVector
    recs.foreach { r =>
      val small = r.size >= 700 && r.size <= 1500
      val large = r.size >= 8 * 1024 && r.size <= 10 * 1024
      assert(small || large, s"size ${r.size} outside both ranges")
    }
  }

  test("the large-record ratio is honored approximately") {
    val recs  = WisconsinGen.records(40000, RecordSpec.oneLarge(0.1), KeyDist.Unique, seed = 2).toVector
    val ratio = recs.count(_.size > 1500).toDouble / recs.size
    assert(ratio > 0.08 && ratio < 0.12, s"observed large ratio $ratio")
  }

  test("All-Small generates no large records") {
    val recs = WisconsinGen.records(5000, RecordSpec.AllSmall, KeyDist.Unique, seed = 3).toVector
    assert(recs.forall(r => r.size >= 700 && r.size <= 1500))
  }

  test("unique keys are 1..n, all distinct") {
    val recs = WisconsinGen.records(5000, RecordSpec.AllSmall, KeyDist.Unique, seed = 4).toVector
    assert(recs.map(_.key).distinct.size == 5000)
    assert(recs.map(_.key).min == 1 && recs.map(_.key).max == 5000)
  }

  test("normal-skew keys stay within [1, n]") {
    val n    = 20000
    val recs = WisconsinGen.records(n, RecordSpec.AllSmall, KeyDist.NormalSkew, seed = 5).toVector
    assert(recs.forall(r => r.key >= 1 && r.key <= n))
  }

  test("normal-skew concentrates ~99% of keys in ~5% of the domain (§7.1.1)") {
    val n     = 100000
    val recs  = WisconsinGen.records(n, RecordSpec.AllSmall, KeyDist.NormalSkew, seed = 6).toVector
    val sigma = n * WisconsinGen.SigmaRatio
    val lo    = n / 2.0 - 2.58 * sigma // 99% of a Normal lies within ±2.58σ
    val hi    = n / 2.0 + 2.58 * sigma
    val inside = recs.count(r => r.key >= lo && r.key <= hi).toDouble / n
    assert(inside > 0.985, s"only $inside of keys in the hot range")
    assert((hi - lo) / n < 0.06, "the hot range must be about 5% of the domain")
  }

  test("generation is deterministic in the seed") {
    def run() = WisconsinGen.records(1000, RecordSpec.threeLarge(0.5), KeyDist.NormalSkew, seed = 7).toVector
    assert(run() == run())
  }

  test("different seeds give different streams") {
    val a = WisconsinGen.records(1000, RecordSpec.AllSmall, KeyDist.Unique, seed = 8).toVector
    val b = WisconsinGen.records(1000, RecordSpec.AllSmall, KeyDist.Unique, seed = 9).toVector
    assert(a.map(_.size) != b.map(_.size))
  }

  test("cardinalityFor sizes datasets to the requested bytes") {
    val spec = RecordSpec.AllSmall
    val n    = WisconsinGen.cardinalityFor(10L << 20, spec)
    val actual = WisconsinGen.records(n, spec, KeyDist.Unique, seed = 10).map(_.size.toLong).sum
    val target = 10L << 20
    assert(math.abs(actual - target).toDouble / target < 0.05, s"got $actual for target $target")
  }

  test("paper-scale sanity: 1 GB of All-Small is about 985k records") {
    val n = WisconsinGen.cardinalityFor(1L << 30, RecordSpec.AllSmall)
    assert(n > 900000 && n < 1050000, s"n=$n")
  }

  test("dataset() returns a re-creatable stream") {
    val (n, mk) = WisconsinGen.dataset(1L << 20, RecordSpec.AllSmall, KeyDist.Unique, seed = 11)
    assert(mk().size == n)
    assert(mk().toVector == mk().toVector)
  }
}
