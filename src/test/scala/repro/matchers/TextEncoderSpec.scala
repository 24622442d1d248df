package repro.matchers

import org.scalatest.funsuite.AnyFunSuite

import repro.matchers.neural.TextEncoder

class TextEncoderSpec extends AnyFunSuite {
  import TextEncoder._

  test("token vectors are deterministic") {
    assert(tokenVec("brown").toSeq == tokenVec("brown").toSeq)
  }
  test("token vectors are L2-normalized") {
    val n = math.sqrt(tokenVec("query").map(x => x * x).sum)
    assert(math.abs(n - 1.0) < 1e-9)
  }
  test("identical tokens have cosine 1") {
    assert(math.abs(cos(tokenVec("jackson"), tokenVec("jackson")) - 1.0) < 1e-9)
  }
  test("one-char-different tokens are highly similar (subword robustness)") {
    assert(cos(tokenVec("brown"), tokenVec("browne")) > 0.6)
  }
  test("unrelated tokens are dissimilar") {
    assert(cos(tokenVec("brown"), tokenVec("query")) < 0.5)
  }

  test("synonym dictionary conflates loves/likes (the iTunes FP mechanism)") {
    assert(normalize("loves") == normalize("likes"))
    assert(cos(tokenVec("loves"), tokenVec("likes")) > 0.999)
  }
  test("slang is normalized (rap-title mechanism)") {
    assert(normalize("luv") == "like" && normalize("4") == "for" && normalize("tha") == "the")
  }
  test("German is covered by the dictionary") {
    assert(normalize("schwarz") == "black" && normalize("preise") == "prices")
  }
  test("Dutch is NOT covered (pretrained-coverage bias)") {
    assert(normalize("zwart") == "zwart" && normalize("prijzen") == "prijzen")
    assert(cos(tokenVec("zwart"), tokenVec("black")) < 0.5)
  }

  test("embed of empty text is the zero vector") {
    assert(embed("").forall(_ == 0.0))
  }
  test("textCos of identical texts is ~1") {
    assert(textCos("sony cyber-shot rx100", "sony cyber-shot rx100") > 0.999)
  }
  test("textCos survives token reorder") {
    assert(textCos("sony rx100 black", "black sony rx100") > 0.999)
  }
  test("textCos handles null-free empty gracefully") {
    assert(textCos("", "abc") == 0.0)
  }

  test("align of identical token sets is 1") {
    assert(math.abs(align("a b c", "c a b") - 1.0) < 1e-9)
  }
  test("align is symmetric") {
    val x = "sony rx100 camera"; val y = "sony rx200 kamera deals"
    assert(math.abs(align(x, y) - align(y, x)) < 1e-12)
  }
  test("align of empty side is 0") {
    assert(align("", "abc") == 0.0)
  }
  test("align sees through translation (de) but not Dutch") {
    val en = "black camera prices"
    assert(align(en, "schwarz kamera preise") > align(en, "zwart camera prijzen"))
  }
  test("align separates same-line model numbers from identical models") {
    val a = "sony cyber-shot cyber-shot75 black camera"
    assert(align(a, a) > align(a, "sony cyber-shot cyber-shot310 black camera"))
  }

  test("normJaccard uses the dictionary") {
    assert(normJaccard("tequila loves me", "tequila likes me") == 1.0)
  }
  test("normJaccard of disjoint texts is 0") {
    assert(normJaccard("a b", "c d") == 0.0)
  }
  test("normJaccard of two empties is 1") {
    assert(normJaccard("", "") == 1.0)
  }
}
