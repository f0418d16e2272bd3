package repro.core

import repro.SparkSpec

/** Greedy minimal cover (paper §4.1.6). */
class CoverSetSpec extends SparkSpec {

  private def t(tag: String) = Transformation(Literal(tag))

  test("greedy picks the largest-gain transformation first") {
    val cands = Vector(
      (t("a"), Array(0, 1, 2, 3, 4)),
      (t("b"), Array(5, 6)),
      (t("c"), Array(0, 1)),
    )
    val cover = CoverSet.greedy(cands, 7)
    assert(cover.map(_.t) == Vector(t("a"), t("b")))
    assert(CoverSet.unionCoverage(cover, 7) == 7)
  }

  test("greedy skips transformations adding no new rows") {
    val cands = Vector(
      (t("a"), Array(0, 1, 2)),
      (t("c"), Array(0, 1)), // subsumed
    )
    val cover = CoverSet.greedy(cands, 3)
    assert(cover.map(_.t) == Vector(t("a")))
  }

  test("classic set-cover instance where greedy is suboptimal but valid") {
    // Optimal = {b, c} (2 sets); greedy takes a (4 rows) then needs b and c.
    val cands = Vector(
      (t("a"), Array(1, 2, 4, 5)),
      (t("b"), Array(0, 1, 2)),
      (t("c"), Array(3, 4, 5)),
    )
    val cover = CoverSet.greedy(cands, 6)
    assert(CoverSet.unionCoverage(cover, 6) == 6)
    assert(cover.size <= 3)
  }

  test("minSupportRows filters low-support transformations") {
    val cands = Vector(
      (t("a"), Array(0, 1, 2)),
      (t("b"), Array(3)), // support 1 < 2
    )
    val cover = CoverSet.greedy(cands, 4, minSupportRows = 2)
    assert(cover.map(_.t) == Vector(t("a")))
    assert(CoverSet.unionCoverage(cover, 4) == 3)
  }

  test("marginal gains are recorded in selection order") {
    val cands = Vector(
      (t("a"), Array(0, 1, 2, 3)),
      (t("b"), Array(2, 3, 4, 5)),
    )
    val cover = CoverSet.greedy(cands, 6)
    assert(cover.map(_.marginalGain) == Vector(4, 2))
  }

  test("empty input yields an empty cover") {
    assert(CoverSet.greedy(Vector.empty, 5).isEmpty)
    assert(CoverSet.greedy(Vector((t("a"), Array[Int]())), 5).isEmpty)
  }

  test("deterministic tie-break prefers fewer placeholders") {
    val long  = Transformation(Substr(0, 1), Substr(1, 2))
    val short = Transformation(Substr(0, 2))
    val cands = Vector((long, Array(0, 1)), (short, Array(0, 1)))
    val cover = CoverSet.greedy(cands, 2)
    assert(cover.head.t == short)
  }

  test("unionCoverage counts distinct rows once") {
    val cover = Vector(
      CoverSet.Chosen(t("a"), Array(0, 1), 2),
      CoverSet.Chosen(t("b"), Array(1, 2), 1),
    )
    assert(CoverSet.unionCoverage(cover, 4) == 3)
  }
}
