package repro.sparkjoin

import repro.SparkSpec
import repro.data.{SynthJoin, WebBenchSim}
import repro.matching.{MatchMetrics, RowMatcher}

/** Parity of the distributed row matcher with the local Algorithm 1. */
class SparkRowMatcherSpec extends SparkSpec {

  private def parity(src: IndexedSeq[String], tgt: IndexedSeq[String]): Unit = {
    val local = RowMatcher.matchPairs(src, tgt)
    val dist  = SparkRowMatcher.matchPairsLocal(spark, src, tgt)
    assert(dist == local, s"spark=${dist.size} local=${local.size}")
  }

  test("parity with local matcher on Figure-1-style names") {
    val names = Vector(
      "rafiei, davood", "nascimento, mario", "gingrich, douglas",
      "prus-czarnecki, andrzej", "bowling, michael", "gosgnach, simon",
    )
    val abbrevs = Vector(
      "d rafiei", "m nascimento", "d gingrich",
      "a prus-czarnecki", "m bowling", "s gosgnach",
    )
    parity(names, abbrevs)
  }

  test("parity with local matcher on a synthetic table") {
    val ds = SynthJoin.synth(40, seed = 21L)
    parity(ds.source, ds.target)
  }

  test("parity with local matcher on a web benchmark table") {
    val ds = WebBenchSim.dataset(WebBenchSim.specs(6)) // phones
    parity(ds.source, ds.target)
  }

  test("distributed matching quality on a web table") {
    val ds    = WebBenchSim.dataset(WebBenchSim.specs.head)
    val pairs = SparkRowMatcher.matchPairsLocal(spark, ds.source, ds.target)
    val prf   = MatchMetrics.score(pairs, ds.goldPairs)
    assert(prf.recall > 0.7, s"recall=${prf.recall}")
  }

  test("empty columns produce no pairs") {
    assert(SparkRowMatcher.matchPairsLocal(spark, Vector.empty, Vector.empty).isEmpty)
    assert(SparkRowMatcher.matchPairsLocal(spark, Vector("abcdef"), Vector.empty).isEmpty)
  }

  test("result schema is (src_id, tgt_id)") {
    import spark.implicits._
    val src = Vector((0L, "rafiei, davood")).toDF("src_id", "src_val")
    val tgt = Vector((0L, "d rafiei")).toDF("tgt_id", "tgt_val")
    val out = SparkRowMatcher.matchPairs(src, tgt)
    assert(out.columns.toSeq == Seq("src_id", "tgt_id"))
  }
}
