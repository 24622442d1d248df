package repro.core

import org.scalatest.funsuite.AnyFunSuite

class TokenizeSpec extends AnyFunSuite {
  import Tokenize._

  test("words lowercases and strips punctuation") {
    assert(words("Hello, World!").toSeq == Seq("hello", "world"))
  }
  test("words keeps digits and @ (language tags)") {
    assert(words("RX100 @nl").toSeq == Seq("rx100", "@nl"))
  }
  test("words on null is empty") { assert(words(null).isEmpty) }
  test("words on empty is empty") { assert(words("").isEmpty) }
  test("words splits on hyphens and slashes") {
    assert(words("hip-hop/rap").toSeq == Seq("hip", "hop", "rap"))
  }
  test("wordSet dedups") { assert(wordSet("a a b") == Set("a", "b")) }

  test("charNGrams pads boundaries") {
    assert(charNGrams("ab").toSeq == Seq("#ab", "ab#"))
  }
  test("charNGrams of single char") { assert(charNGrams("a").toSeq == Seq("#a#")) }
  test("charNGrams empty/null") {
    assert(charNGrams("").isEmpty && charNGrams(null).isEmpty)
  }
  test("charNGrams count = len(padded) - n + 1") {
    assert(charNGrams("brown").length == "#brown#".length - 3 + 1)
  }
  test("charNGrams is case-insensitive") {
    assert(charNGrams("Brown").toSeq == charNGrams("brown").toSeq)
  }
  test("one-char-different tokens share most grams") {
    val a = charNGrams("brown").toSet; val b = charNGrams("browne").toSet
    assert(a.intersect(b).size >= a.size - 1)
  }

  test("tf counts term frequency") {
    assert(tf("a a b") == Map("a" -> 2, "b" -> 1))
  }
  test("cosine of identical maps = 1") {
    val m = Map("a" -> 2, "b" -> 1)
    assert(math.abs(cosine(m, m) - 1.0) < 1e-12)
  }
  test("cosine of disjoint maps = 0") {
    assert(cosine(Map("a" -> 1), Map("b" -> 1)) == 0.0)
  }
  test("cosine with empty map = 0") {
    assert(cosine(Map.empty, Map("b" -> 1)) == 0.0)
  }
}
