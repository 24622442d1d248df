package repro.core

import org.scalacheck.{Gen, Properties}
import org.scalacheck.Prop.forAll

/** Native ScalaCheck property suite for the similarity measures. */
object SimilarityProps extends Properties("Similarity") {
  import Similarity._

  private val str: Gen[String] = Gen.listOfN(10, Gen.alphaNumChar).map(_.mkString).flatMap(s =>
    Gen.choose(0, s.length).map(s.take))

  property("levSim identity") = forAll(str) { s => levenshteinSim(s, s) == 1.0 }
  property("levSim symmetry") = forAll(str, str) { (a, b) => levenshteinSim(a, b) == levenshteinSim(b, a) }
  property("levSim bounds") = forAll(str, str) { (a, b) =>
    val v = levenshteinSim(a, b); v >= 0.0 && v <= 1.0
  }
  property("jaro identity") = forAll(str) { s => s.isEmpty || jaro(s, s) == 1.0 }
  property("jaroWinkler >= jaro") = forAll(str, str) { (a, b) => jaroWinkler(a, b) >= jaro(a, b) - 1e-12 }
  property("jaccard bounds") = forAll(str, str) { (a, b) =>
    val v = tokenJaccard(a, b); v >= 0.0 && v <= 1.0
  }
  property("exact is 0 or 1") = forAll(str, str) { (a, b) =>
    val v = exactSim(a, b); v == 0.0 || v == 1.0
  }
  property("cosine identity") = forAll(str) { s => tfCosine(s, s) >= (if (Tokenize.words(s).isEmpty) 1.0 else 1.0 - 1e-9) }
  property("numericSim identity on ints") = forAll(Gen.choose(-10000, 10000)) { n =>
    numericSim(n.toString, n.toString) == 1.0
  }
}
