package repro.core

/** Greedy minimal set cover over transformations (paper §4.1.6).
  *
  * Finding the minimal covering set is the classic NP-complete set-cover
  * problem; the greedy rule — repeatedly take the transformation covering the
  * most still-uncovered rows — achieves the H(n) <= ln(n) + 1 approximation
  * bound.
  */
object CoverSet {

  /** One chosen transformation with the rows it covers (all rows, not just
    * the marginal ones) and the marginal gain at selection time.
    */
  final case class Chosen(t: Transformation, covered: Array[Int], marginalGain: Int)

  /** Greedy cover. `candidates` pair each transformation with its covered row
    * indices over an input of `nRows` rows; `minSupportRows` drops
    * transformations with too little support (the paper's support threshold,
    * §6.4 uses 1% on Open data; §5.3 argues at least two supporting rows).
    * Ties break toward fewer placeholders, then lexicographic rendering, so
    * results are deterministic.
    */
  def greedy(
      candidates: Vector[(Transformation, Array[Int])],
      nRows: Int,
      minSupportRows: Int = 2,
  ): Vector[Chosen] = {
    val eligible  = candidates.filter(_._2.length >= math.max(1, minSupportRows))
    val uncovered = new java.util.BitSet(nRows)
    uncovered.set(0, nRows)
    val chosen = Vector.newBuilder[Chosen]
    var remaining = eligible
    var continue  = remaining.nonEmpty && nRows > 0
    while (continue) {
      var best: (Transformation, Array[Int]) = null
      var bestGain = 0
      for (cand <- remaining) {
        var gain = 0
        var i = 0
        while (i < cand._2.length) { if (uncovered.get(cand._2(i))) gain += 1; i += 1 }
        if (
          gain > bestGain ||
          (gain == bestGain && gain > 0 && best != null &&
            (cand._1.placeholderCount < best._1.placeholderCount ||
              (cand._1.placeholderCount == best._1.placeholderCount &&
                cand._1.render < best._1.render)))
        ) { best = cand; bestGain = gain }
      }
      if (best == null || bestGain == 0) continue = false
      else {
        chosen += Chosen(best._1, best._2, bestGain)
        best._2.foreach(uncovered.clear)
        remaining = remaining.filterNot(_._1 == best._1)
        if (uncovered.isEmpty || remaining.isEmpty) continue = false
      }
    }
    chosen.result()
  }

  /** Rows covered by the union of a cover set. */
  def unionCoverage(cover: Seq[Chosen], nRows: Int): Int = {
    val bits = new java.util.BitSet(nRows)
    cover.foreach(_.covered.foreach(bits.set))
    bits.cardinality()
  }
}
