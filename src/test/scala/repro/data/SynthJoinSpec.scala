package repro.data

import repro.SparkSpec
import repro.core.Discovery

/** The paper's §6.1 synthetic generator. */
class SynthJoinSpec extends SparkSpec {

  private val ds  = SynthJoin.synth(50, seed = 1L)
  private val dsL = SynthJoin.synthL(50, seed = 1L)

  test("row counts and naming") {
    assert(ds.source.size == 50 && ds.target.size == 50)
    assert(ds.name == "Synth-50" && dsL.name == "Synth-50L")
  }

  test("source lengths are in the specified ranges") {
    assert(ds.source.forall(s => s.length >= 20 && s.length <= 35))
    assert(dsL.source.forall(s => s.length >= 40 && s.length <= 70))
  }

  test("average source length matches the paper's reported ~27.6 / ~55") {
    val big = SynthJoin.synth(500, seed = 2L)
    assert(math.abs(big.avgSourceLen - 27.5) < 2.0)
    val bigL = SynthJoin.synthL(500, seed = 2L)
    assert(math.abs(bigL.avgSourceLen - 55.0) < 4.0)
  }

  test("exactly 3 gold transformations, each with 2 placeholders") {
    assert(ds.goldTransformations.size == 3)
    for (t <- ds.goldTransformations) {
      assert(t.placeholderCount == 2)
      val lits = t.units.count(_.isConstant)
      assert(lits >= 1 && lits <= 2)
    }
  }

  test("every gold pair is covered by some gold transformation") {
    for ((s, g) <- ds.goldPairStrings)
      assert(ds.goldTransformations.exists(_.covers(s, g)), s"no gold covers ($s, $g)")
  }

  test("gold pairs form a perfect matching") {
    assert(ds.goldPairs.size == 50)
    assert(ds.goldPairs.map(_._1).size == 50)
    assert(ds.goldPairs.map(_._2).toSet.size == 50)
  }

  test("deterministic in the seed") {
    val a = SynthJoin.synth(50, seed = 9L)
    val b = SynthJoin.synth(50, seed = 9L)
    assert(a.source == b.source && a.target == b.target && a.goldPairs == b.goldPairs)
    val c = SynthJoin.synth(50, seed = 10L)
    assert(a.source != c.source)
  }

  test("discovery recovers full coverage on Synth-50 gold pairs") {
    val res = Discovery.discover(ds.goldPairStrings)
    assert(res.setCoverage == 1.0, s"cover=${res.transformations.map(_.render)}")
    assert(res.coverSet.size <= 6) // 3 gold rules, possibly merged/split variants
  }

  test("discovery recovers full coverage on Synth-50L gold pairs") {
    val res = Discovery.discover(dsL.goldPairStrings)
    assert(res.setCoverage == 1.0)
  }

  test("each gold transformation has material support (random assignment)") {
    val counts = ds.goldTransformations.map(t => ds.goldPairStrings.count { case (s, g) => t.covers(s, g) })
    assert(counts.forall(_ >= 5), s"counts=$counts")
  }

  test("larger tables generate with the same invariants") {
    val big = SynthJoin.synth(500, seed = 3L)
    assert(big.source.size == 500)
    assert(big.goldPairStrings.forall { case (s, g) =>
      big.goldTransformations.exists(_.covers(s, g))
    })
  }
}
