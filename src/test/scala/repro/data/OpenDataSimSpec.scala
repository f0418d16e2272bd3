package repro.data

import repro.SparkSpec
import repro.matching.{MatchMetrics, RowMatcher}

/** The simulated open-government dataset (DESIGN.md §3): gold matching plus
  * an intentionally low-precision n-gram matching surface.
  */
class OpenDataSimSpec extends SparkSpec {

  private val ds = OpenDataSim.generate(rows = 600, seed = 5L)

  test("requested row count, distinct sources") {
    assert(ds.source.size == 600)
    assert(ds.source.distinct.size == 600)
  }

  test("exactly 3 gold transformations, all Split-based") {
    assert(ds.goldTransformations.size == 3)
  }

  test("every gold pair covered by a gold transformation") {
    for ((s, g) <- ds.goldPairStrings)
      assert(ds.goldTransformations.exists(_.covers(s, g)))
  }

  test("address format looks like the documented shape") {
    assert(ds.source.forall(_.endsWith(" edmonton")))
    assert(ds.source.forall(_.split(' ').length == 5))
  }

  test("n-gram matching floods: high recall, very low precision") {
    val pairs = RowMatcher.matchPairs(ds.source, ds.target)
    val prf   = MatchMetrics.score(pairs, ds.goldPairs)
    assert(prf.recall >= 0.8, s"recall=${prf.recall}")
    assert(prf.precision <= 0.2, s"precision=${prf.precision}")
    assert(pairs.size > ds.source.size * 5, s"pairs=${pairs.size}")
  }

  test("deterministic in the seed") {
    val a = OpenDataSim.generate(rows = 200, seed = 1L)
    val b = OpenDataSim.generate(rows = 200, seed = 1L)
    assert(a.source == b.source && a.target == b.target)
  }

  test("default scale matches the paper's 3808 golden rows") {
    // Generation only (no matching) — cheap even at full scale.
    val full = OpenDataSim.generate()
    assert(full.source.size == 3808)
  }
}
