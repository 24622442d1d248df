package repro.core

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

/** Unit + sampled-property tests for the similarity library (no Spark). */
class SimilaritySpec extends AnyFunSuite {
  import Similarity._

  /** Deterministic sampled property check over random ascii string pairs. */
  private def forSamples(n: Int = 200, seed: Long = 1)(p: (String, String) => Unit): Unit = {
    val rnd = new Random(seed)
    def s(): String = rnd.alphanumeric.take(rnd.nextInt(12)).mkString
    (0 until n).foreach { _ => p(s(), s()) }
  }

  // ---- Levenshtein ----
  test("levenshtein distance of identical strings is 0") {
    assert(levenshteinDist("kitten", "kitten") == 0)
  }
  test("levenshtein kitten/sitting = 3") { assert(levenshteinDist("kitten", "sitting") == 3) }
  test("levenshtein empty vs s = |s|") { assert(levenshteinDist("", "abc") == 3) }
  test("levenshtein single substitution") { assert(levenshteinDist("brown", "browe") == 1) }
  test("levSim identical = 1") { assert(levenshteinSim("abc", "abc") == 1.0) }
  test("levSim disjoint = 0") { assert(levenshteinSim("aaa", "bbb") == 0.0) }
  test("levSim null -> 0") { assert(levenshteinSim(null, "x") == 0.0) }
  test("levSim both empty = 1") { assert(levenshteinSim("", "") == 1.0) }
  test("levSim one-char perturbation of a name stays above 0.5") {
    assert(levenshteinSim("Mueller", "Muneller") > 0.5)
    assert(levenshteinSim("Qingming Huang", "Qingming Huadg") > 0.5)
  }
  test("levSim symmetric (sampled)") {
    forSamples() { (a, b) => assert(levenshteinSim(a, b) == levenshteinSim(b, a)) }
  }
  test("levSim in [0,1] (sampled)") {
    forSamples() { (a, b) => val s = levenshteinSim(a, b); assert(s >= 0.0 && s <= 1.0) }
  }
  test("levenshtein dist <= max length (sampled)") {
    forSamples() { (a, b) => assert(levenshteinDist(a, b) <= math.max(a.length, b.length)) }
  }
  test("levenshtein triangle inequality (sampled)") {
    val rnd = new Random(3)
    def s(): String = rnd.alphanumeric.take(rnd.nextInt(8)).mkString
    (0 until 100).foreach { _ =>
      val (a, b, c) = (s(), s(), s())
      assert(levenshteinDist(a, c) <= levenshteinDist(a, b) + levenshteinDist(b, c))
    }
  }

  // ---- Jaro / Jaro-Winkler ----
  test("jaro identical = 1") { assert(jaro("martha", "martha") == 1.0) }
  test("jaro martha/marhta ~ 0.944") { assert(math.abs(jaro("martha", "marhta") - 0.944) < 0.001) }
  test("jaro dixon/dicksonx ~ 0.767") { assert(math.abs(jaro("dixon", "dicksonx") - 0.767) < 0.001) }
  test("jaro disjoint = 0") { assert(jaro("abc", "xyz") == 0.0) }
  test("jaroWinkler boosts shared prefixes") {
    assert(jaroWinkler("martha", "marhta") > jaro("martha", "marhta"))
  }
  test("jaroWinkler identical = 1") { assert(jaroWinkler("brown", "brown") == 1.0) }
  test("jaroWinkler null -> 0") { assert(jaroWinkler("a", null) == 0.0) }
  test("jaroWinkler symmetric (sampled)") {
    forSamples() { (a, b) => assert(math.abs(jaroWinkler(a, b) - jaroWinkler(b, a)) < 1e-12) }
  }
  test("jaroWinkler in [0,1] (sampled)") {
    forSamples() { (a, b) => val s = jaroWinkler(a, b); assert(s >= 0.0 && s <= 1.0 + 1e-12) }
  }

  // ---- token Jaccard ----
  test("jaccard identical token sets = 1") { assert(tokenJaccard("the red fox", "red the fox") == 1.0) }
  test("jaccard half overlap") { assert(tokenJaccard("a b", "b c") == 1.0 / 3) }
  test("jaccard disjoint = 0") { assert(tokenJaccard("a b", "c d") == 0.0) }
  test("jaccard case-insensitive") { assert(tokenJaccard("Fox", "fox") == 1.0) }
  test("jaccard null -> 0") { assert(tokenJaccard(null, "a") == 0.0) }
  test("jaccard both empty = 1") { assert(tokenJaccard("", "") == 1.0) }
  test("jaccard symmetric and bounded (sampled)") {
    forSamples() { (a, b) =>
      val s = tokenJaccard(a, b)
      assert(s == tokenJaccard(b, a) && s >= 0.0 && s <= 1.0)
    }
  }

  // ---- overlap coefficient ----
  test("overlap of subset = 1") { assert(overlapCoeff("a b", "a b c d") == 1.0) }
  test("overlap disjoint = 0") { assert(overlapCoeff("a", "b") == 0.0) }
  test("overlap >= jaccard (sampled)") {
    val rnd = new Random(5)
    def words(): String = (0 until rnd.nextInt(6)).map(_ => ('a' + rnd.nextInt(5)).toChar.toString).mkString(" ")
    (0 until 200).foreach { _ =>
      val (a, b) = (words(), words())
      assert(overlapCoeff(a, b) >= tokenJaccard(a, b) - 1e-12)
    }
  }

  // ---- TF cosine ----
  test("cosine identical = 1") { assert(math.abs(tfCosine("a b c", "c b a") - 1.0) < 1e-9) }
  test("cosine orthogonal = 0") { assert(tfCosine("a b", "c d") == 0.0) }
  test("cosine null -> 0") { assert(tfCosine("a", null) == 0.0) }
  test("cosine bounded (sampled)") {
    val rnd = new Random(7)
    def words(): String = (0 until rnd.nextInt(6)).map(_ => ('a' + rnd.nextInt(5)).toChar.toString).mkString(" ")
    (0 until 200).foreach { _ =>
      val s = tfCosine(words(), words()); assert(s >= 0.0 && s <= 1.0 + 1e-9)
    }
  }

  // ---- exact / numeric ----
  test("exact match ignoring case/space = 1") { assert(exactSim(" VLDB ", "vldb") == 1.0) }
  test("exact mismatch = 0") { assert(exactSim("VLDB", "SIGMOD") == 0.0) }
  test("exact with null = 0") { assert(exactSim(null, null) == 0.0) }
  test("numericSim equal = 1") { assert(numericSim("42", "42.0") == 1.0) }
  test("numericSim close years high") { assert(numericSim("2001", "2002") > 0.99) }
  test("numericSim non-numeric -> 0") { assert(numericSim("abc", "42") == 0.0) }
  test("numericSim null -> 0") { assert(numericSim(null, "1") == 0.0) }
  test("numericSim bounded (sampled)") {
    val rnd = new Random(9)
    (0 until 200).foreach { _ =>
      val s = numericSim((rnd.nextDouble * 2e6 - 1e6).toString, (rnd.nextDouble * 2e6 - 1e6).toString)
      assert(s >= 0.0 && s <= 1.0)
    }
  }
}
