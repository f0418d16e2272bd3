package repro.core

import org.scalacheck.Gen
import repro.{PropHelper, SparkSpec}

/** Transformation composition semantics (paper Definition 2) and the worked
  * examples from the paper.
  */
class TransformationSpec extends SparkSpec with PropHelper {

  test("concatenates unit outputs in order") {
    val t = Transformation(Substr(0, 2), Literal("-"), Substr(2, 4))
    assert(t("abcd").contains("ab-cd"))
  }

  test("undefined if any unit is undefined") {
    val t = Transformation(Substr(0, 2), Split(',', 5))
    assert(t("abcd").isEmpty)
  }

  test("empty transformation produces the empty string") {
    assert(Transformation(Vector.empty)("anything").contains(""))
  }

  test("paper §3.2 example: name reformat transformation") {
    // <SplitSubstr(' ',2,0,1), Literal(' '), Split(',', 1)>
    val t = Transformation(SplitSubstr(' ', 2, 0, 1), Literal(" "), Split(',', 1))
    assert(t("prus-czarnecki, andrzej").contains("a prus-czarnecki"))
    assert(t("bowling, michael").contains("m bowling"))
    assert(t("gosgnach, simon").contains("s gosgnach"))
  }

  test("paper §4.1 example: name to email transformation") {
    val t = Transformation(
      Split(' ', 2), Literal("."), Split(',', 1), Literal("@ualberta.ca"),
    )
    assert(t("bowling, michael").contains("michael.bowling@ualberta.ca"))
  }

  test("paper §4.1.2 example: t1 covers row 1, t2 covers row 2, t3 covers both") {
    val r1 = ("abcdefghijklmn", "defg.jkb")
    val r2 = ("0123456789abcd", "d456.9ab")
    val t1 = Transformation(Substr(3, 7), Literal("."), Substr(9, 11), Literal("b"))
    val t2 = Transformation(Literal("d"), Substr(4, 7), Literal("."), Substr(9, 12))
    val t3 = Transformation(Literal("d"), Substr(4, 7), Literal("."), Substr(9, 11), Literal("b"))
    // (the paper writes 1-based-looking offsets; with 0-based [s, e) these
    // are the equivalent parameters)
    assert(t1.covers(r1._1, r1._2) && !t1.covers(r2._1, r2._2))
    assert(t2.covers(r2._1, r2._2) && !t2.covers(r1._1, r1._2))
    assert(t3.covers(r1._1, r1._2) && t3.covers(r2._1, r2._2))
    assert(t1.placeholderCount == 2 && t2.placeholderCount == 2 && t3.placeholderCount == 2)
    assert(t3.units.size == 5 && t1.units.size == 4 && t2.units.size == 4)
  }

  test("paper Lemma 3 example: literal+split beats maximal-length splits") {
    val r1 = ("12345sabcdefg", "abcdefg")
    val r2 = ("67890taxxxx", "axxxx")
    val tMax1 = Transformation(Split('s', 2))
    val tMax2 = Transformation(Split('t', 2))
    val tGen  = Transformation(Literal("a"), Split('a', 2))
    assert(tMax1.covers(r1._1, r1._2) && !tMax1.covers(r2._1, r2._2))
    assert(tMax2.covers(r2._1, r2._2) && !tMax2.covers(r1._1, r1._2))
    assert(tGen.covers(r1._1, r1._2) && tGen.covers(r2._1, r2._2))
  }

  test("placeholderCount counts non-constant units only") {
    val t = Transformation(Literal("a"), Substr(0, 1), Literal("b"), Split(',', 1))
    assert(t.placeholderCount == 2)
  }

  test("isConstant iff all units are literals") {
    assert(Transformation(Literal("a"), Literal("b")).isConstant)
    assert(!Transformation(Literal("a"), Substr(0, 1)).isConstant)
  }

  test("structural equality enables hash-set dedup") {
    val a = Transformation(Split(',', 1), Literal("x"))
    val b = Transformation(Split(',', 1), Literal("x"))
    val c = Transformation(Split(',', 2), Literal("x"))
    assert(a == b && a.hashCode == b.hashCode && a != c)
    assert(Set(a, b, c).size == 2)
  }

  test("covers requires exact equality, not substring") {
    val t = Transformation(Substr(0, 2))
    assert(!t.covers("abcd", "abc"))
    assert(t.covers("abcd", "ab"))
  }

  test("render shows units in sequence") {
    val t = Transformation(Split(',', 1), Literal(" "))
    assert(t.render == "<Split(',',1), Literal(' ')>")
  }

  test("applying a transformation is deterministic (property)") {
    val gen = Gen.alphaNumStr
    val t   = Transformation(Substr(0, 3), Literal("-"), Split('5', 1))
    forAllSampled(gen) { s => assert(t(s) == t(s)) }
  }
}
