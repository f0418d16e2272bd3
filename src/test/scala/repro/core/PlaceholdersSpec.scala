package repro.core

import org.scalacheck.Gen
import repro.{PropHelper, SparkSpec}

/** Placeholder detection (paper Definition 4, §4.1.3). */
class PlaceholdersSpec extends SparkSpec with PropHelper {
  import Placeholders._

  test("maxMatchLengths: every prefix that occurs in the source is counted") {
    val m = maxMatchLengths("abcdef", "cdex")
    assert(m(0) == 3) // "cde" occurs
    assert(m(1) == 2) // "de"
    assert(m(2) == 1) // "e"
    assert(m(3) == 0) // "x" absent
  }

  test("maxMatchLengths satisfies m(j+1) >= m(j) - 1 (property)") {
    val gen = for {
      s <- Gen.listOfN(12, Gen.oneOf('a', 'b', 'c')).map(_.mkString)
      t <- Gen.listOfN(8, Gen.oneOf('a', 'b', 'c', 'd')).map(_.mkString)
    } yield (s, t)
    forAllSampled(gen) { case (s, t) =>
      val m = maxMatchLengths(s, t)
      for (j <- 0 until m.length - 1) assert(m(j + 1) >= m(j) - 1)
    }
  }

  test("occurrences finds all overlapping matches") {
    assert(occurrences("aaaa", "aa") == Vector(0, 1, 2))
    assert(occurrences("abcabc", "abc") == Vector(0, 3))
    assert(occurrences("abc", "x") == Vector.empty)
    assert(occurrences("abc", "") == Vector.empty)
  }

  test("paper §4.1 example: michael and bowling are placeholders of the email") {
    val src = "bowling, michael"
    val tgt = "michael.bowling@ualberta.ca"
    val ps  = maximal(src, tgt)
    val texts = ps.map(_.text)
    assert(texts.contains("michael"))
    assert(texts.contains("bowling"))
  }

  test("maximal placeholders are not contained in one another") {
    val gen = for {
      s <- Gen.listOfN(15, Gen.oneOf('a', 'b', 'c', ' ')).map(_.mkString)
      t <- Gen.listOfN(10, Gen.oneOf('a', 'b', 'c', 'd', ' ')).map(_.mkString)
    } yield (s, t)
    forAllSampled(gen) { case (s, t) =>
      val ps = maximal(s, t)
      for {
        a <- ps; b <- ps if a != b
      } assert(!(a.tStart >= b.tStart && a.tStart + a.len <= b.tStart + b.len))
    }
  }

  test("every maximal placeholder text occurs in the source at its srcStarts") {
    val src = "victor robbie kasumba"
    val tgt = "victor r. kasumba"
    for (p <- maximal(src, tgt); o <- p.srcStarts)
      assert(src.substring(o, o + p.len) == p.text)
  }

  test("identical source and target yield one whole-string placeholder") {
    val ps = maximal("abcdef", "abcdef")
    assert(ps == Vector(Placeholder(0, 6, "abcdef", Vector(0))))
  }

  test("disjoint alphabets yield no placeholders") {
    assert(maximal("abc", "xyz").isEmpty)
  }

  test("empty target yields no placeholders") {
    assert(maximal("abc", "").isEmpty)
  }

  test("every substring of a placeholder is itself a placeholder (footnote 2)") {
    val src = "hello world"
    val tgt = "xx world yy"
    val m   = maxMatchLengths(src, tgt)
    val p   = maximal(src, tgt).head
    // any substring inside the block also occurs in the source
    for (a <- p.tStart until p.tStart + p.len)
      assert(m(a) >= p.tStart + p.len - a)
  }
}
