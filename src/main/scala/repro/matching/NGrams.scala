package repro.matching

/** Character n-gram utilities shared by the local and Spark row matchers. */
object NGrams {

  /** All distinct character n-grams of length `n` in `s` (sliding window). */
  def distinct(s: String, n: Int): Vector[String] =
    if (n <= 0 || s.length < n) Vector.empty
    else (0 to s.length - n).iterator.map(i => s.substring(i, i + n)).distinct.toVector

  /** All distinct n-grams over a size range, tagged with their length. */
  def distinctRange(s: String, n0: Int, nMax: Int): Vector[(Int, String)] =
    (n0 to math.min(nMax, s.length)).iterator.flatMap { n =>
      distinct(s, n).iterator.map(g => (n, g))
    }.toVector
}
