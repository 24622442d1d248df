package repro.data

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

import repro.core.Similarity

class NamesSpec extends AnyFunSuite {

  test("perturb changes the string") {
    val rnd = new Random(1)
    (0 until 200).foreach { _ =>
      assert(Names.perturb("brown", rnd) != "brown")
    }
  }
  test("perturb applies exactly one edit (distance 1)") {
    val rnd = new Random(2)
    (0 until 200).foreach { _ =>
      val p = Names.perturb("qingming", rnd)
      assert(Similarity.levenshteinDist("qingming", p) == 1)
    }
  }
  test("perturb is deterministic in the Random instance") {
    assert(Names.perturb("mueller", new Random(7)) == Names.perturb("mueller", new Random(7)))
  }
  test("perturb of empty/null is identity") {
    val rnd = new Random(3)
    assert(Names.perturb("", rnd) == "")
    assert(Names.perturb(null, rnd) == null)
  }

  test("cn surname pool is much smaller than de pool (condition i)") {
    assert(Names.cnSurnames.size * 3 <= Names.deSurnames.size)
  }
  test("afr surname pool is much smaller than cauc pool (condition i)") {
    assert(Names.afrSurnames.size * 3 <= Names.caucSurnames.size)
  }
  test("pools are duplicate-free") {
    for (p <- Seq(Names.cnSurnames, Names.deSurnames, Names.afrSurnames,
                  Names.caucSurnames, Names.afrFirstNames, Names.caucFirstNames,
                  Names.deGivenNames, Names.cnGivenSyllables))
      assert(p.distinct.size == p.size)
  }
  test("afr and cauc surname pools are disjoint (clean group signal)") {
    assert(Names.afrSurnames.toSet.intersect(Names.caucSurnames.toSet).isEmpty)
  }
  test("afr first names are pairwise edit distance >= 2 (perturbation cannot collide them)") {
    val p = Names.afrFirstNames.map(_.toLowerCase)
    for (i <- p.indices; j <- i + 1 until p.size) {
      val d = Similarity.levenshteinDist(p(i), p(j))
      assert(d >= 2, s"${p(i)} ~ ${p(j)} distance $d")
    }
  }
  test("afr first-name pool contains distance-2 similarity clusters (neural FP fuel)") {
    val p = Names.afrFirstNames.map(_.toLowerCase)
    val close = for {
      i <- p.indices; j <- i + 1 until p.size
      if Similarity.levenshteinDist(p(i), p(j)) == 2
    } yield (p(i), p(j))
    assert(close.size >= 3)
  }

  test("cn full names collide more often than de full names") {
    val rnd = new Random(11)
    val cn = (0 until 400).map(_ => Names.cnFullName(rnd))
    val de = (0 until 400).map(_ => Names.deFullName(rnd))
    assert(cn.distinct.size < de.distinct.size)
  }
  test("cn full names have higher mean pairwise similarity than de names") {
    val rnd = new Random(13)
    val cn = (0 until 60).map(_ => Names.cnFullName(rnd))
    val de = (0 until 60).map(_ => Names.deFullName(rnd))
    def meanSim(xs: Seq[String]): Double = {
      val ps = for (i <- xs.indices; j <- i + 1 until xs.size)
        yield Similarity.levenshteinSim(xs(i), xs(j))
      ps.sum / ps.size
    }
    assert(meanSim(cn) > meanSim(de) + 0.05)
  }
  test("full names have a given and a family part") {
    val rnd = new Random(17)
    assert(Names.cnFullName(rnd).split(" ").length == 2)
    assert(Names.deFullName(rnd).split(" ").length == 2)
  }
}
